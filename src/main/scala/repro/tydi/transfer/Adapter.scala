package repro.tydi.transfer

import repro.tydi.physical.PhysicalStream
import repro.tydi.types.Compat

/** Intrinsics over physical streams (paper §5.3): small, portable pieces of
  * functionality every backend should provide, which a fixed component
  * library cannot cover because they depend on the concrete interface.
  */
object Intrinsics {

  /** A slice: a registered pass-through that breaks combinatorial paths. At
    * transfer level it is the identity on the transfer sequence.
    */
  def slice(transfers: Vector[Transfer]): Vector[Transfer] = transfers

  /** Optimistically connect a source physical stream to a sink whose
    * properties are identical except for complexity (paper §4.2.2, §5.3).
    * A plain connection requires identical complexity; the adapter
    * re-organizes transfers so any source complexity can feed any sink
    * complexity. The Tydi wire-level rule (a source may drive a sink of
    * greater or equal complexity, [[Compat.physicallyConnectable]]) falls
    * out as the no-reorganization case.
    */
  def adaptComplexity(
      source: PhysicalStream,
      sink: PhysicalStream,
      transfers: Vector[Transfer],
  ): Vector[Transfer] = {
    require(source.copy(complexity = sink.complexity) == sink,
      s"adapter requires streams identical up to complexity: $source vs $sink")
    val values = Deserializer.deserialize(source, transfers)
    Serializer.serialize(sink, values)
  }

  /** Drive a default (null) value stream: zero transfers — the sink sees a
    * permanently idle but validly terminated stream. For dimensionality > 0
    * this is simply the absence of any sequence.
    */
  def defaultDriver: Vector[Transfer] = Vector.empty
}

/** Checks that a transfer sequence obeys the *guarantees* of a stream's
  * complexity level — the restrictions a low-complexity source must satisfy
  * so that low-complexity (simpler) sinks can rely on them (paper §4.1,
  * Figure 1). These are asserted in tests against the serializer's output.
  */
object TransferRules {

  final case class Violation(transferIdx: Int, rule: String) {
    override def toString: String = s"transfer $transferIdx: $rule"
  }

  def check(ps: PhysicalStream, transfers: Vector[Transfer]): Vector[Violation] = {
    val v = Vector.newBuilder[Violation]
    val d = ps.dimensionality
    transfers.zipWithIndex.foreach { case (t, i) =>
      Transfer.validate(ps, t).left.foreach(e => v += Violation(i, e))
      val active = t.activeLanes(ps)
      if (ps.complexity < 6 && t.stai != 0)
        v += Violation(i, s"C<6 requires stai=0, got ${t.stai}")
      if (ps.complexity < 7) {
        // Without full strobe freedom, active lanes must be contiguous.
        if (active.nonEmpty && (active.last - active.head + 1) != active.size)
          v += Violation(i, s"C<7 requires contiguous active lanes, got $active")
      }
      if (ps.complexity < 4 && active.isEmpty && transfers.nonEmpty)
        v += Violation(i, "C<4 forbids empty transfers (postponed last)")
      if (ps.complexity == 1 && d > 0) {
        // C1: data aligned to the first lane; only the final transfer of an
        // inner sequence may leave trailing lanes inactive.
        if (active.nonEmpty && active.head != 0)
          v += Violation(i, s"C1 requires alignment to lane 0, got start ${active.head}")
        val closes = t.last.exists(identity)
        if (!closes && active.size != ps.lanes)
          v += Violation(i, "C1 requires full transfers except at a sequence boundary")
      }
    }
    v.result()
  }
}
