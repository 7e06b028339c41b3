package repro.tydi.spec

import repro.tydi.ir.Ref

/** Literal data in the testing grammar (paper §6.1):
  *
  *  - `"10"` — a single element, written as a bit string;
  *  - `("10", "01", "11")` — a series of elements transferred over a Stream
  *    without dimensionality;
  *  - `[["1", "0"], ["0"]]` — square brackets indicate dimensionality;
  *  - `{ in1: (...), out: (...) }` — per-field transactions for a port whose
  *    Stream has (possibly Reversed) child Streams.
  */
sealed trait DataLit
final case class ElemLit(bits: String) extends DataLit {
  require(bits.forall(c => c == '0' || c == '1'), s"bit string expected, got '$bits'")
  def value: BigInt = if (bits.isEmpty) BigInt(0) else BigInt(bits, 2)
  def width: Int    = bits.length
}
final case class SeriesLit(items: Vector[DataLit]) extends DataLit
final case class DimLit(items: Vector[DataLit])    extends DataLit
final case class FieldLit(fields: Vector[(String, DataLit)]) extends DataLit

/** A statement in a test declaration. Transaction verification on ports
  * happens in parallel by default, rather than in declaration sequence
  * (paper §6.1, property 1).
  */
sealed trait TestStmt

/** `uut.port = data;` — mathematical equality: whether the data is driven or
  * observed-and-compared is determined automatically from the direction of
  * the port's physical streams (paper §6.1, property 2).
  */
final case class PortAssert(port: String, data: DataLit) extends TestStmt

/** A `sequence` of explicit stages: assertions within each stage happen in
  * parallel, but each stage must pass before the next stage's assertions are
  * performed (paper §6.1) — needed for components that observe state, like
  * the counter example.
  */
final case class SequenceAssert(
    name: String,
    stages: Vector[(String, Vector[TestStmt])],
) extends TestStmt

/** A test declaration: transaction-level verification of one Streamlet
  * (the unit under test), expressed against abstract streams of data.
  */
final case class TestDecl(
    namespace: Vector[String],
    name: String,
    uut: Ref,
    stmts: Vector[TestStmt],
    doc: Option[String] = None,
)
