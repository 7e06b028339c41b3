package repro.tydi.spec

/** Abstract data carried over a logical Stream, independent of how transfers
  * are organized (the transfer organization is the physical layer's job, see
  * [[repro.tydi.transfer]]).
  *
  * A value is either a single element or a (possibly nested) sequence. A
  * Stream of dimensionality D carries D levels of [[DSeq]] around [[DElem]]
  * leaves.
  */
sealed trait DataValue {
  /** Nesting depth: 0 for an element, 1 + max-child-depth for sequences. */
  def depth: Int = this match {
    case _: DElem    => 0
    case DSeq(items) => 1 + (if (items.isEmpty) 0 else items.map(_.depth).max)
  }

  def flatten: Vector[BigInt] = this match {
    case DElem(v)    => Vector(v)
    case DSeq(items) => items.flatMap(_.flatten)
  }

  def render: String = this match {
    case DElem(v)    => v.toString
    case DSeq(items) => items.map(_.render).mkString("[", ", ", "]")
  }
}
final case class DElem(value: BigInt) extends DataValue
final case class DSeq(items: Vector[DataValue]) extends DataValue
object DSeq {
  def of(items: DataValue*): DSeq = DSeq(items.toVector)
}
object DElem {
  def apply(v: Long): DElem = DElem(BigInt(v))
}

object DataValue {

  /** Convert a test-grammar literal to an abstract value.
    *
    *  - A bare element stays an element.
    *  - A parenthesized series `("10", "01")` is a series *without*
    *    dimensionality: it is transferred as consecutive elements, so it
    *    converts to a flat sequence at depth 1 that the harness treats as
    *    dimension-less when the port's Stream has dimensionality 0.
    *  - Square brackets add explicit dimensions.
    *
    * Field literals have no single value; resolve them per-field first.
    */
  def fromLit(lit: DataLit): DataValue = lit match {
    case e: ElemLit       => DElem(e.value)
    case SeriesLit(items) => DSeq(items.map(fromLit))
    case DimLit(items)    => DSeq(items.map(fromLit))
    case _: FieldLit =>
      throw new IllegalArgumentException(
        "field literal must be resolved per-field before conversion")
  }
}
