package repro.tydi.spark

import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthData}
import repro.tydi.til.Parser

/** Structured Streaming integration: the Streamlet composition produced by
  * the IR applies unchanged to streaming sources — the title's "streaming
  * dataflow designs" mapped onto Structured Streaming operator composition.
  */
class StreamingSpec extends SparkSpec {

  test("a stateless composed pipeline runs under Structured Streaming (append mode)") {
    val li = SynthData.lineitem(spark, 0.002).limit(5000).cache()
    val parsed   = Parser.parse(TpchDataflow.tilSource)
    val executor = new DataflowExecutor(parsed.project, TpchDataflow.registry)
    val got = StreamingRunner.runOnce(spark,
      Map("lineitem" -> TpchDataflow.lineitemInput(li)), outputMode = "append") { inputs =>
      // Just the filter streamlet: stateless, append-compatible.
      executor.execute(spark, Vector("repro", "tpch"), "filter_lineitem",
        Map("in_lineitem" -> inputs("lineitem")))("out_lineitem")
    }
    val want = TpchDataflow.lineitemInput(li)
      .filter(col("l_shipdate") > lit(TpchDataflow.cutoffDate))
    assert(got.count() == want.count())
    assert(got.exceptAll(want).isEmpty)
  }

  test("a streaming aggregation runs in complete mode and matches the batch result") {
    val li = SynthData.lineitem(spark, 0.002).limit(5000).cache()
    val input = TpchDataflow.lineitemInput(li)
      .withColumn("o_orderdate", col("l_shipdate"))
      .select("l_orderkey", "l_extendedprice", "l_discount", "o_orderdate")
    val parsed   = Parser.parse(TpchDataflow.tilSource)
    val executor = new DataflowExecutor(parsed.project, TpchDataflow.registry)
    val got = StreamingRunner.runOnce(spark,
      Map("joined" -> input), outputMode = "complete") { inputs =>
      executor.execute(spark, Vector("repro", "tpch"), "aggregate_revenue",
        Map("in_joined" -> inputs("joined")))("out_revenue")
    }
    val want = executor.execute(spark, Vector("repro", "tpch"), "aggregate_revenue",
      Map("in_joined" -> input))("out_revenue")
    assert(got.exceptAll(want).isEmpty)
    assert(want.exceptAll(got).isEmpty)
  }
}
