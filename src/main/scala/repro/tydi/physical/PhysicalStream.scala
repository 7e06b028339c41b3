package repro.tydi.physical

import repro.tydi.types._

/** A named bit-field inside a physical stream's element or user payload.
  * Paths record the Group/Union field names the bits came from, so backends
  * can generate alternative representations (records/arrays, paper §8.2) and
  * the Spark backend can rebuild typed columns.
  */
final case class ElementField(path: Vector[String], width: Int) {
  def name: String = if (path.isEmpty) "data" else path.mkString("_")
}

/** One physical stream produced by lowering a logical Stream (paper §4.1,
  * §7.1 "a query for splitting a Stream into physical streams").
  *
  * @param path           name path relative to the port (empty = the port's
  *                       own top-level stream)
  * @param elementFields  flattened element-manipulating content per lane
  * @param lanes          element lanes: cumulative throughput rounded up
  * @param dimensionality total nested-sequence depth (own + inherited
  *                       dimensions per synchronicity)
  * @param complexity     transfer-organization guarantee level, 1..8
  * @param reversed       cumulative direction: true if this physical stream
  *                       flows against the port's nominal direction
  * @param userFields     flattened user-signal content (transfer-independent)
  */
final case class PhysicalStream(
    path: Vector[String],
    elementFields: Vector[ElementField],
    lanes: Int,
    dimensionality: Int,
    complexity: Int,
    reversed: Boolean,
    userFields: Vector[ElementField],
) {
  require(lanes >= 1, s"physical stream must have at least one lane, got $lanes")

  def elementWidth: Int = elementFields.map(_.width).sum
  def userWidth: Int    = userFields.map(_.width).sum

  /** Width of the data signal: lanes x element width. */
  def dataWidth: Int = lanes * elementWidth

  def name: String = path.mkString("__")
}

/** Error raised during lowering; codifies the spec oversight from paper
  * §8.1(1): directly nested Streams which must both be retained cannot be
  * given uniquely named physical streams, so the toolchain returns an error.
  */
final case class LoweringError(message: String) extends RuntimeException(message)
