package repro.tydi.transfer

import repro.tydi.physical.PhysicalStream
import repro.tydi.spec.{DElem, DSeq, DataValue}

/** Options exercising the freedoms a complexity level grants a source
  * (paper Figure 1). Each option is only honored when the stream's
  * complexity permits it; at lower complexities the serializer silently
  * produces the (unique) restricted organization.
  *
  * @param laneOffset   start data at this lane instead of lane 0 (C >= 6)
  * @param postponeLast emit last flags on a separate empty transfer (C >= 4)
  *                     or on a trailing inactive lane (C = 8)
  * @param strobeHoles  scatter elements over non-contiguous lanes (C >= 7)
  */
final case class SerializeOptions(
    laneOffset: Int = 0,
    postponeLast: Boolean = false,
    strobeHoles: Boolean = false,
)

final case class SerializeError(message: String) extends RuntimeException(message)

/** Serialize abstract data values into transfers, honoring the guarantees of
  * the stream's complexity level (paper §4.1):
  *
  *  - C1: elements aligned to the first lane, full transfers, last asserted
  *    per transfer, one innermost sequence per transfer series;
  *  - C < 4: last flags coincide with the final data transfer of a sequence
  *    (no postponement) and empty sequences cannot be represented;
  *  - C >= 4: last flags may arrive on a later, empty transfer;
  *  - C >= 6: transfers may start at a non-zero lane (stai);
  *  - C >= 7: lanes may be inactive anywhere (strobe);
  *  - C = 8: last is asserted per lane — multiple sequence boundaries can
  *    share one transfer, and an inactive lane can close a sequence for a
  *    previous lane or transfer.
  */
object Serializer {

  /** An element position (or pure boundary) in the flattened value stream:
    * `close(d)` means dimension d ends after this position. The flags need
    * not be downward-closed: an empty outer sequence closes dimension d with
    * the inner flags unset (there was no inner sequence to close).
    */
  final case class Entry(elem: Option[BigInt], close: Vector[Boolean]) {
    def closesAny: Boolean = close.exists(identity)
  }

  /** Flatten successive data values into entries. Each value must have depth
    * equal to the stream's dimensionality (a depth-1 series over a
    * dimensionality-0 stream is a sequence of independent values).
    */
  def flatten(ps: PhysicalStream, values: Vector[DataValue]): Vector[Entry] = {
    val d = ps.dimensionality
    if (d == 0) {
      values.flatMap {
        case DElem(v)    => Vector(Entry(Some(v), Vector.empty))
        case s: DSeq     =>
          s.items.map {
            case DElem(v) => Entry(Some(v), Vector.empty)
            case other    => throw SerializeError(
              s"dimensionality-0 stream cannot carry nested value ${other.render}")
          }
      }
    } else values.flatMap { v =>
      if (v.depth > d)
        throw SerializeError(s"value depth ${v.depth} > stream dimensionality $d: ${v.render}")
      walk(v, d, d)
    }
  }

  /** Flatten one value of `level` remaining dimensions; the final entry of
    * the result closes dimension `level - 1` (and, transitively, the inner
    * dimensions its last item closed).
    */
  private def walk(v: DataValue, level: Int, dims: Int): Vector[Entry] = v match {
    case DElem(x) =>
      if (level != 0)
        throw SerializeError(s"element where a depth-$level sequence was expected")
      Vector(Entry(Some(x), Vector.fill(dims)(false)))
    case DSeq(items) =>
      if (level < 1)
        throw SerializeError("sequence nesting deeper than dimensionality")
      if (items.isEmpty)
        Vector(Entry(None, Vector.tabulate(dims)(_ == level - 1)))
      else {
        items.zipWithIndex.flatMap { case (item, idx) =>
          val sub = walk(item, level - 1, dims)
          if (idx == items.size - 1)
            sub.init :+ sub.last.copy(close = sub.last.close.updated(level - 1, true))
          else sub
        }
      }
  }

  def serialize(
      ps: PhysicalStream,
      values: Vector[DataValue],
      opts: SerializeOptions = SerializeOptions(),
  ): Vector[Transfer] = {
    val entries = flatten(ps, values)
    // Empty sequences produce pure-boundary entries, which need an empty
    // transfer (or inactive lane) to carry their last flags.
    if (ps.complexity < 4 && entries.exists(_.elem.isEmpty))
      throw SerializeError(
        s"empty sequence requires an empty transfer, complexity >= 4 (stream has C${ps.complexity})")
    if (ps.complexity >= 8) serializeC8(ps, entries, opts)
    else serializeLow(ps, entries, opts)
  }

  // ---- complexity < 8: transfer-level last ----

  private def serializeLow(
      ps: PhysicalStream, entries: Vector[Entry], opts: SerializeOptions): Vector[Transfer] = {
    val d = ps.dimensionality
    val out = Vector.newBuilder[Transfer]

    // Split into runs: a run is a maximal prefix of entries ending at the
    // first entry closing a dimension (or at the end of input). At C < 8,
    // last is per-transfer, so one transfer never spans a sequence boundary.
    var i = 0
    while (i < entries.length) {
      val start = i
      while (i < entries.length && !entries(i).closesAny) i += 1
      val boundary = if (i < entries.length) { i += 1; Some(entries(i - 1)) } else None
      val run      = entries.slice(start, i)
      val elems    = run.flatMap(_.elem)
      val close    = boundary.map(_.close).getOrElse(Vector.fill(d)(false))
      emitRun(ps, elems, close, opts, out)
    }

    val result = out.result()
    // Dimensionality-0 or boundary-less tails produce plain transfers; make
    // sure every transfer carries a last field of the right width.
    result.map(t => if (d == 0) t.copy(last = Vector.empty) else t)
  }

  /** Emit the transfers of one innermost run of `elems`, closing the
    * dimensions flagged in `close` after the final element.
    */
  private def emitRun(
      ps: PhysicalStream,
      elems: Vector[BigInt],
      close: Vector[Boolean],
      opts: SerializeOptions,
      out: collection.mutable.Builder[Transfer, Vector[Transfer]],
  ): Unit = {
    val n = ps.lanes
    val d = ps.dimensionality
    val offset =
      if (ps.complexity >= 6) math.min(opts.laneOffset, n - 1) else 0
    val postpone = opts.postponeLast && ps.complexity >= 4 && d > 0
    val noLast = Vector.fill(d)(false)

    if (elems.isEmpty) {
      // Pure boundary: an empty transfer carrying only last flags (C >= 4).
      out += Transfer(Vector.fill(n)(None), close, 0, 0)
      return
    }

    // Chunk elements: the first transfer honors the lane offset.
    var idx   = 0
    var first = true
    val chunks = Vector.newBuilder[(Int, Vector[BigInt])] // (startLane, elems)
    while (idx < elems.length) {
      val startLane = if (first) offset else 0
      val cap       = n - startLane
      chunks += ((startLane, elems.slice(idx, idx + cap)))
      idx += cap
      first = false
    }
    val allChunks = chunks.result()
    allChunks.zipWithIndex.foreach { case ((startLane, chunk), ci) =>
      val isFinal = ci == allChunks.size - 1
      val holes   = opts.strobeHoles && ps.complexity >= 7 &&
        chunk.size * 2 - 1 <= n - startLane
      val laneOf: Int => Int =
        if (holes) (k: Int) => startLane + 2 * k else (k: Int) => startLane + k
      val data = Vector.tabulate(n) { lane =>
        val k = chunk.indices.find(laneOf(_) == lane)
        k.map(chunk(_))
      }
      val endLane = laneOf(chunk.size - 1)
      val flags   = if (isFinal && !postpone) close else noLast
      out += Transfer(data, flags, startLane, endLane)
    }
    if (postpone && close.exists(identity))
      out += Transfer(Vector.fill(n)(None), close, 0, 0)
  }

  // ---- complexity 8: per-lane last ----

  private def serializeC8(
      ps: PhysicalStream, entries: Vector[Entry], opts: SerializeOptions): Vector[Transfer] = {
    val n = ps.lanes
    val d = ps.dimensionality
    val out   = Vector.newBuilder[Transfer]
    val data  = Array.fill[Option[BigInt]](n)(None)
    val last  = Array.fill(n * d)(false)
    var lane  = math.min(if (ps.complexity >= 6) opts.laneOffset else 0, n - 1)
    var dirty = false

    def flush(): Unit = {
      if (dirty) {
        out += Transfer(data.toVector, last.toVector, 0, n - 1)
        java.util.Arrays.fill(last, false)
        (0 until n).foreach(data(_) = None)
        lane = 0
        dirty = false
      }
    }

    def advance(): Unit = { lane += 1; if (lane >= n) flush() }

    // With postponeLast, move every closing onto its own (inactive) lane —
    // Figure 1's "using an inactive lane to assert last for a previous lane
    // or transfer".
    val noLast = Vector.fill(d)(false)
    val expanded =
      if (opts.postponeLast)
        entries.flatMap {
          case e @ Entry(Some(_), c) if e.closesAny =>
            Vector(Entry(e.elem, noLast), Entry(None, c))
          case other => Vector(other)
        }
      else entries

    for (Entry(elem, close) <- expanded) {
      if (opts.strobeHoles && dirty && lane < n - 1 && (lane % 2 == 1)) advance()
      elem.foreach { e => data(lane) = Some(e) }
      if (d > 0) close.indices.foreach(c => if (close(c)) last(lane * d + c) = true)
      dirty = true
      advance()
    }
    flush()
    out.result()
  }
}
