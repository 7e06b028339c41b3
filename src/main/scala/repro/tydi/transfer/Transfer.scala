package repro.tydi.transfer

import repro.tydi.physical.{PhysicalStream, Signals}

/** One valid handshake on a physical stream, at signal level (paper Figure 1).
  *
  * @param data per-lane element values; `None` = inactive lane (strobe low)
  * @param last the last signal: at complexity < 8 one flag per dimension for
  *             the whole transfer (innermost dimension first); at complexity 8
  *             per lane, lane-major (`lane * D + dim`) — an inactive lane may
  *             carry last flags to postpone sequence closure (Figure 1)
  * @param stai start index: first active lane (complexity >= 6)
  * @param endi end index: last active lane
  * @param user value of the user signal, independent of transfers
  */
final case class Transfer(
    data: Vector[Option[BigInt]],
    last: Vector[Boolean],
    stai: Int,
    endi: Int,
    user: BigInt = BigInt(0),
) {
  def lanes: Int = data.size

  /** Active lanes per the significance rule of paper §8.1(2b): start/end
    * indices are only significant when all strobe bits are asserted active;
    * otherwise the strobe determines lane activity.
    */
  def activeLanes(ps: PhysicalStream): Vector[Int] = {
    val strobePresent = Signals.hasStrb(ps)
    val strobe        = data.map(_.isDefined)
    if (strobePresent && !strobe.forall(identity))
      strobe.zipWithIndex.collect { case (true, i) => i }
    else (stai to endi).toVector.filter(i => data(i).isDefined)
  }

  /** Transfer-level last flags (complexity < 8). */
  def lastFlags(dims: Int): Vector[Boolean] = {
    require(last.size == dims, s"expected $dims last bits, got ${last.size}")
    last
  }

  /** Per-lane last flags for one lane (complexity 8). */
  def laneLastFlags(lane: Int, dims: Int): Vector[Boolean] =
    last.slice(lane * dims, (lane + 1) * dims)
}

object Transfer {

  /** Structural well-formedness of a transfer against its physical stream. */
  def validate(ps: PhysicalStream, t: Transfer): Either[String, Unit] = {
    if (t.data.size != ps.lanes)
      Left(s"transfer has ${t.data.size} lanes, stream has ${ps.lanes}")
    else if (t.last.size != Signals.lastWidth(ps) && !(ps.dimensionality == 0 && t.last.isEmpty))
      Left(s"last width ${t.last.size}, expected ${Signals.lastWidth(ps)}")
    else if (t.stai < 0 || t.stai >= ps.lanes)
      Left(s"stai ${t.stai} out of range")
    else if (t.endi < 0 || t.endi >= ps.lanes)
      Left(s"endi ${t.endi} out of range")
    else if (ps.complexity < 6 && t.stai != 0)
      Left(s"stai ${t.stai} != 0 requires complexity >= 6, stream has C${ps.complexity}")
    else Right(())
  }
}
