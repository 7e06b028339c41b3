package repro.tydi.types

/** The five Tydi logical types (paper §4.1): the stream-manipulating Stream
  * type and the element-manipulating Null, Bits, Group and Union types.
  *
  * Identifiers given to types in a namespace are *not* part of the type
  * (paper §4.2.2): two types with different names but identical structure are
  * fully compatible. Field identifiers of Group and Union, however, *are*
  * part of the type — `Group(a: Null)` is incompatible with `Group(b: Null)`.
  * Structural equality of these case classes therefore implements exactly the
  * IR's compatibility relation (see [[Compat]]).
  */
sealed trait LogicalType {

  /** True if this type contains no Stream nodes anywhere (it is purely
    * element-manipulating and may appear as a `user` signal type).
    */
  def isElementOnly: Boolean = this match {
    case TNull | TBits(_)   => true
    case TGroup(fs)         => fs.forall(_.tpe.isElementOnly)
    case TUnion(fs)         => fs.forall(_.tpe.isElementOnly)
    case _: TStream         => false
  }

  /** Bit width of the element-manipulating content of this type, with Stream
    * nodes contributing nothing (they are split into separate physical
    * streams during lowering; a Union variant that is a Stream contributes
    * only to the tag).
    */
  def elementWidth: Int = this match {
    case TNull       => 0
    case TBits(n)    => n
    case TGroup(fs)  => fs.map(_.tpe.elementWidth).sum
    case u: TUnion   => u.tagWidth + u.variantDataWidth
    case _: TStream  => 0
  }
}

/** Null: transfers of one-valued data; its only valid value is null. */
case object TNull extends LogicalType

/** Bits(N): a data signal of N bits. */
final case class TBits(n: Int) extends LogicalType {
  require(n > 0, s"Bits width must be positive, got $n")
}

/** A named field of a Group or Union. Field names are part of the type. */
final case class Field(name: String, tpe: LogicalType) {
  require(name.nonEmpty, "field name must be non-empty")
}

/** Group: a composite of multiple types; every field is set at the same time. */
final case class TGroup(fields: Vector[Field]) extends LogicalType {
  require(fields.map(_.name).distinct.size == fields.size,
    s"duplicate field names in Group: ${fields.map(_.name)}")
}
object TGroup {
  def apply(fields: (String, LogicalType)*): TGroup =
    TGroup(fields.map { case (n, t) => Field(n, t) }.toVector)
}

/** Union: an exclusive disjunction of types; exactly one field is active at a
  * time, selected with a tag signal of ceil(log2 #fields) bits.
  */
final case class TUnion(fields: Vector[Field]) extends LogicalType {
  require(fields.nonEmpty, "Union must have at least one field")
  require(fields.map(_.name).distinct.size == fields.size,
    s"duplicate field names in Union: ${fields.map(_.name)}")

  /** Tag width: bits needed to select among the fields (0 for a 1-field union). */
  def tagWidth: Int = if (fields.size <= 1) 0 else ceilLog2(fields.size)

  /** Width of the shared data payload: the widest non-stream variant. */
  def variantDataWidth: Int =
    fields.map(f => if (f.tpe.isElementOnly) f.tpe.elementWidth else 0).max

  private def ceilLog2(n: Int): Int = 32 - Integer.numberOfLeadingZeros(n - 1)
}
object TUnion {
  def apply(fields: (String, LogicalType)*): TUnion =
    TUnion(fields.map { case (n, t) => Field(n, t) }.toVector)
}

/** Synchronicity: how strongly a child Stream's dimensional information
  * relates to its parent's (paper §4.1). Sync: every parent element has a
  * matching child transfer (child carries the parent's dimensions too);
  * Desync: child transfers have arbitrary size; the Flat variants omit the
  * redundant last signals the parent dimensions would add.
  */
sealed abstract class Synchronicity(val name: String)
case object Sync       extends Synchronicity("Sync")
case object Flatten    extends Synchronicity("Flatten")
case object Desync     extends Synchronicity("Desync")
case object FlatDesync extends Synchronicity("FlatDesync")
object Synchronicity {
  val all: Seq[Synchronicity] = Seq(Sync, Flatten, Desync, FlatDesync)
  def parse(s: String): Option[Synchronicity] = all.find(_.name == s)
}

/** Direction of a child Stream relative to its parent (paper §4.1). */
sealed abstract class StreamDirection(val name: String)
case object Forward extends StreamDirection("Forward")
case object Reverse extends StreamDirection("Reverse")
object StreamDirection {
  def parse(s: String): Option[StreamDirection] =
    Seq(Forward, Reverse).find(_.name == s)
}

/** Stream: a new physical stream carrying an element-manipulating type (or,
  * transitively, further nested Streams), plus the transfer-organization
  * properties from paper §4.1.
  *
  * @param data           the logical type carried on the element lanes
  * @param throughput     expected elements per handshake, relative to parent
  * @param dimensionality number of nested-sequence levels ("last" signals)
  * @param synchronicity  relation of this Stream's dimensions to its parent's
  * @param complexity     transfer-organization guarantee level, 1..8
  * @param direction      flow relative to the parent Stream
  * @param user           optional element-manipulating user-signal type
  * @param keep           force this logical Stream into its own physical stream
  */
final case class TStream(
    data: LogicalType,
    throughput: Rational          = Rational.one,
    dimensionality: Int           = 0,
    synchronicity: Synchronicity  = Sync,
    complexity: Int               = 1,
    direction: StreamDirection    = Forward,
    user: Option[LogicalType]     = None,
    keep: Boolean                 = false,
) extends LogicalType {
  require(dimensionality >= 0, s"dimensionality must be >= 0, got $dimensionality")
  require(complexity >= 1 && complexity <= 8,
    s"complexity must be in 1..8, got $complexity (the specification currently defines 8 levels)")
  user.foreach(u => require(u.isElementOnly,
    s"user signal must carry an element-manipulating type, got $u"))
}
