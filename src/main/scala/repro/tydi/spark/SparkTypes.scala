package repro.tydi.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.types._
import repro.tydi.types._

/** Mapping from Tydi logical types to Catalyst types — the Spark backend's
  * equivalent of the VHDL backend's signal lowering. The paper's types are
  * "extensively used in big data and SQL applications" (abstract); this is
  * the concrete correspondence for DataFrame-based dataflow:
  *
  *  - `Null`          -> `NullType` (one-valued data)
  *  - `Bits(1)`       -> `BooleanType`
  *  - `Bits(n<=64)`   -> `LongType`
  *  - `Bits(n>64)`    -> `BinaryType`
  *  - `Group`         -> `StructType` (all fields set at the same time)
  *  - `Union`         -> `StructType` with a `tag` byte plus one nullable
  *                       field per variant (exclusive disjunction)
  *  - `Stream` (dim D)-> D levels of `ArrayType` around the element type; a
  *                       nested child Stream stays a nested (array) field —
  *                       rows, unlike wires, compose hierarchically.
  */
object SparkTypes {

  def toSpark(t: LogicalType): DataType = t match {
    case TNull               => NullType
    case TBits(1)            => BooleanType
    case TBits(n) if n <= 64 => LongType
    case TBits(_)            => BinaryType
    case TGroup(fs) =>
      StructType(fs.map(f => StructField(f.name, toSpark(f.tpe), nullable = true)))
    case TUnion(fs) =>
      StructType(
        StructField("tag", ByteType, nullable = false) +:
          fs.map(f => StructField(f.name, toSpark(f.tpe), nullable = true)))
    case s: TStream =>
      (0 until s.dimensionality).foldLeft(toSpark(s.data))((dt, _) => ArrayType(dt))
  }

  /** The flat column schema of a *port*: the top-level structure of the
    * Stream's element type becomes DataFrame columns. A Group spreads its
    * fields into columns; any other element type becomes a single `value`
    * column. This is what streamlet kernels exchange.
    */
  def portColumns(port: TStream): Vector[(String, DataType)] = port.data match {
    case TGroup(fs) => fs.map(f => f.name -> toSpark(f.tpe))
    case other      => Vector("value" -> toSpark(other))
  }

  /** Validate that a DataFrame structurally fits a port: its column names
    * must equal the port's column names. Scalar representations are left to
    * the kernels (a `Bits(64)` column may legitimately hold a date or a
    * string's dictionary code in a simulation), so only names are enforced —
    * this is the contract-checking part of "interfaces as contracts"
    * (paper §4.2) at the DataFrame layer.
    *
    * A `seq` column is always admitted: streams are ordered and DataFrames
    * are not, so `seq` carries the transfer order where a kernel needs it.
    */
  def validateFrame(context: String, df: DataFrame, port: TStream): Either[String, Unit] = {
    val want = portColumns(port).map(_._1).toSet
    val got  = df.columns.toSet - "seq"
    if (want == got) Right(())
    else Left(s"$context: port expects columns ${want.toVector.sorted.mkString(", ")} " +
      s"but frame has ${got.toVector.sorted.mkString(", ")}")
  }
}
