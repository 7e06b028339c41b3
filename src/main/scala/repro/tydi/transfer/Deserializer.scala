package repro.tydi.transfer

import scala.collection.mutable
import repro.tydi.physical.PhysicalStream
import repro.tydi.spec.{DElem, DSeq, DataValue}

final case class DeserializeError(message: String) extends RuntimeException(message)

/** Rebuild abstract data values from transfers. The sink implements the most
  * permissive interpretation (complexity 8 semantics subsume the lower
  * levels) and honors the significance rule of paper §8.1(2b): start/end
  * indices are only significant when all strobe bits are asserted.
  */
object Deserializer {

  def deserialize(ps: PhysicalStream, transfers: Vector[Transfer]): Vector[DataValue] = {
    val d = ps.dimensionality
    transfers.foreach(t => Transfer.validate(ps, t).left.foreach(e => throw DeserializeError(e)))

    // accum(k) accumulates completed depth-k values; elements land in accum(0).
    val accum = Vector.fill(d + 1)(mutable.ArrayBuffer.empty[DataValue])

    /** Apply per-dimension last flags, innermost first. Closing dimension k
      * with pending elements in an *unclosed* inner dimension is an error
      * (unterminated inner sequence); closing with empty inner accumulators
      * yields an empty sequence — how empty outer sequences are signaled.
      */
    def applyFlags(flags: Vector[Boolean]): Unit =
      for (k <- flags.indices if flags(k)) {
        if ((0 until k).exists(accum(_).nonEmpty))
          throw DeserializeError(
            s"last flags $flags close dimension $k while an inner sequence is open")
        accum(k + 1) += DSeq(accum(k).toVector)
        accum(k).clear()
      }

    for (t <- transfers) {
      val active = t.activeLanes(ps).toSet
      if (ps.complexity >= 8 && d > 0) {
        // Per-lane last: every lane (active or not) may close sequences.
        for (lane <- 0 until ps.lanes) {
          if (active.contains(lane))
            accum(0) += DElem(t.data(lane).getOrElse(
              throw new IllegalStateException(s"active lane $lane has no data")))
          applyFlags(t.laneLastFlags(lane, d))
        }
      } else {
        for (lane <- t.activeLanes(ps))
          accum(0) += DElem(t.data(lane).get)
        if (d > 0) applyFlags(t.lastFlags(d))
      }
    }

    if (d == 0) accum(0).toVector
    else {
      if (accum.init.exists(_.nonEmpty))
        throw DeserializeError("stream ended with unterminated sequences")
      accum(d).toVector
    }
  }

  /** Convenience: deserialize a stream expected to carry exactly one value. */
  def deserializeOne(ps: PhysicalStream, transfers: Vector[Transfer]): DataValue =
    deserialize(ps, transfers) match {
      case Vector(v) => v
      case vs        => throw DeserializeError(s"expected exactly one value, got ${vs.size}")
    }
}
