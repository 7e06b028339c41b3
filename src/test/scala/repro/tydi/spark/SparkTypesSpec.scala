package repro.tydi.spark

import org.apache.spark.sql.types._
import repro.SparkSpec
import repro.tydi.types._

class SparkTypesSpec extends SparkSpec {

  test("Bits maps by width: boolean, long, binary") {
    assert(SparkTypes.toSpark(TBits(1)) == BooleanType)
    assert(SparkTypes.toSpark(TBits(8)) == LongType)
    assert(SparkTypes.toSpark(TBits(64)) == LongType)
    assert(SparkTypes.toSpark(TBits(65)) == BinaryType)
    assert(SparkTypes.toSpark(TBits(1152)) == BinaryType)
  }

  test("Null maps to NullType — one-valued data") {
    assert(SparkTypes.toSpark(TNull) == NullType)
  }

  test("Group maps to a StructType with one field per member, in order") {
    val st = SparkTypes.toSpark(TGroup("a" -> TBits(8), "b" -> TBits(1)))
    assert(st == StructType(Seq(
      StructField("a", LongType, nullable = true),
      StructField("b", BooleanType, nullable = true))))
  }

  test("Union maps to a tagged struct — the exclusive disjunction keeps its tag") {
    val st = SparkTypes.toSpark(TUnion("data" -> TBits(8), "null" -> TNull))
      .asInstanceOf[StructType]
    assert(st.fields.map(_.name).toVector == Vector("tag", "data", "null"))
    assert(st("tag").dataType == ByteType)
    assert(!st("tag").nullable)
  }

  test("Stream dimensionality becomes nested ArrayType levels") {
    assert(SparkTypes.toSpark(TStream(TBits(8), dimensionality = 0)) == LongType)
    assert(SparkTypes.toSpark(TStream(TBits(8), dimensionality = 1)) ==
      ArrayType(LongType))
    assert(SparkTypes.toSpark(TStream(TBits(8), dimensionality = 2)) ==
      ArrayType(ArrayType(LongType)))
  }

  test("a nested child Stream stays a nested array field — rows compose hierarchically") {
    val t = TStream(TGroup(
      "head" -> TBits(8),
      "body" -> TStream(TBits(8), dimensionality = 1, complexity = 2)), complexity = 2)
    val st = SparkTypes.toSpark(t).asInstanceOf[StructType]
    assert(st("body").dataType == ArrayType(LongType))
  }

  test("port columns: a Group element spreads into one column per field") {
    val port = TStream(TGroup("l_orderkey" -> TBits(64), "l_discount" -> TBits(64)))
    assert(SparkTypes.portColumns(port).map(_._1) ==
      Vector("l_orderkey", "l_discount"))
  }

  test("port columns: a scalar element becomes a single `value` column") {
    assert(SparkTypes.portColumns(TStream(TBits(8))).map(_._1) == Vector("value"))
  }

  test("validateFrame accepts matching column sets and rejects others") {
    import spark.implicits._
    val port = TStream(TGroup("a" -> TBits(64), "b" -> TBits(64)))
    val good = Seq((1L, 2L)).toDF("a", "b")
    val bad  = Seq((1L, 2L)).toDF("a", "c")
    assert(SparkTypes.validateFrame("t", good, port).isRight)
    val err = SparkTypes.validateFrame("t", bad, port)
    assert(err.isLeft)
    assert(err.left.exists(_.contains("t:")))
  }
}
