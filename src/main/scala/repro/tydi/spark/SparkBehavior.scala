package repro.tydi.spark

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import repro.tydi.spec._

/** Adapts a Spark [[Kernel]] to the transaction-level [[Behavior]] interface
  * of the testing grammar (paper §6.1): abstract streams of data driven on
  * ports become DataFrames, the kernel runs, and observed frames are read
  * back as abstract streams — so the same test declarations verify both the
  * pure simulator and the Spark backend.
  *
  * Encoding: a series of elements becomes rows `(seq, value)` ordered by
  * `seq`; one dimension of nesting becomes an array column. Deeper nesting
  * uses nested arrays.
  */
final class SparkBehavior(spark: SparkSession, kernel: Kernel) extends Behavior {

  override def evaluate(driven: Map[String, DataValue]): Map[String, DataValue] = {
    val inputs = driven.map { case (key, value) => key -> toFrame(value) }
    val outputs = kernel(spark, inputs)
    outputs.map { case (key, df) => key -> fromFrame(df) }
  }

  /** A series (flat or dimensioned) becomes one DataFrame with columns
    * `seq` (ordering) and `value`.
    */
  def toFrame(v: DataValue): DataFrame = {
    val items: Vector[DataValue] = v match {
      case DSeq(is)   => is
      case e: DElem   => Vector(e)
    }
    val depth = if (items.isEmpty) 0 else items.map(_.depth).max
    val valueType = (0 until depth).foldLeft(LongType: DataType)((dt, _) => ArrayType(dt))
    val schema = StructType(Seq(
      StructField("seq", LongType, nullable = false),
      StructField("value", valueType, nullable = true)))
    val rows = items.zipWithIndex.map { case (item, i) =>
      Row(i.toLong, toAny(item))
    }
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toList, 1), schema)
  }

  private def toAny(v: DataValue): Any = v match {
    case DElem(x)    => x.toLong
    case DSeq(items) => items.map(toAny)
  }

  /** Read a frame back as an abstract series, ordered by `seq` when present. */
  def fromFrame(df: DataFrame): DataValue = {
    val ordered =
      if (df.columns.contains("seq")) df.orderBy("seq").drop("seq") else df
    require(ordered.columns.length == 1,
      s"behavior frames must have a single value column, got ${ordered.columns.mkString(",")}")
    val rows = ordered.collect().toVector
    DSeq(rows.map(r => fromAny(r.get(0))))
  }

  private def fromAny(x: Any): DataValue = x match {
    case null                 => DElem(BigInt(0))
    case l: Long              => DElem(BigInt(l))
    case i: Int               => DElem(BigInt(i))
    case b: Boolean           => DElem(if (b) BigInt(1) else BigInt(0))
    case s: collection.Seq[_] => DSeq(s.toVector.map(fromAny))
    case other =>
      throw new IllegalArgumentException(s"unsupported value ${other.getClass}: $other")
  }
}
