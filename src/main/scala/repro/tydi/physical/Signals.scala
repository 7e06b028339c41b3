package repro.tydi.physical

/** One hardware signal of a physical stream.
  *
  * @param suffix      canonical Tydi signal suffix (valid/ready/data/last/...)
  * @param width       bit width; width 1 renders as `std_logic` in VHDL
  * @param downstream  true for source->sink signals; `ready` flows upstream
  */
final case class Signal(suffix: String, width: Int, downstream: Boolean) {
  require(width >= 1, s"signal $suffix must be at least 1 bit")
}

/** Signal computation and omission rules for a physical stream, per the Tydi
  * physical specification as amended by the paper's fixes (§8.1):
  *
  *  - `valid`/`ready`: always present (handshake).
  *  - `data`: lanes x element width bits; omitted when zero.
  *  - `last`: at complexity < 8 one field of D bits per transfer; at
  *    complexity 8 per lane (N*D bits). Omitted when dimensionality is 0.
  *  - `stai` (start index): ceil(log2 N) bits; present iff C >= 6 and N > 1.
  *  - `endi` (end index): ceil(log2 N) bits; present iff N > 1. The spec made
  *    this contingent on (C >= 5 or D > 0), which would leave multi-lane,
  *    zero-dimensional streams at C < 5 unable to disable lanes — the paper's
  *    fix §8.1(3b) makes it solely contingent on throughput > 1.
  *  - `strb` (strobe): N bits; present iff C >= 7 or D > 0.
  *  - `user`: user width bits; omitted when zero.
  */
object Signals {

  def ceilLog2(n: Int): Int =
    if (n <= 1) 0 else 32 - Integer.numberOfLeadingZeros(n - 1)

  def lastWidth(s: PhysicalStream): Int =
    if (s.dimensionality == 0) 0
    else if (s.complexity >= 8) s.lanes * s.dimensionality
    else s.dimensionality

  def hasStai(s: PhysicalStream): Boolean = s.complexity >= 6 && s.lanes > 1

  /** Paper fix §8.1(3b): end index solely contingent on throughput > 1. */
  def hasEndi(s: PhysicalStream): Boolean = s.lanes > 1

  def hasStrb(s: PhysicalStream): Boolean = s.complexity >= 7 || s.dimensionality > 0

  /** The signals of a physical stream, in canonical order. */
  def of(s: PhysicalStream): Vector[Signal] = {
    val idxW = ceilLog2(s.lanes)
    val b    = Vector.newBuilder[Signal]
    b += Signal("valid", 1, downstream = true)
    b += Signal("ready", 1, downstream = false)
    if (s.dataWidth > 0) b += Signal("data", s.dataWidth, downstream = true)
    if (lastWidth(s) > 0) b += Signal("last", lastWidth(s), downstream = true)
    if (hasStai(s)) b += Signal("stai", idxW, downstream = true)
    if (hasEndi(s)) b += Signal("endi", idxW, downstream = true)
    if (hasStrb(s)) b += Signal("strb", s.lanes, downstream = true)
    if (s.userWidth > 0) b += Signal("user", s.userWidth, downstream = true)
    b.result()
  }

  /** Total signal count for a set of physical streams (for Table 1). */
  def count(streams: Seq[PhysicalStream]): Int = streams.map(of(_).size).sum
}
