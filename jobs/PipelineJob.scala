package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.SynthData
import repro.tydi.spark.TpchDataflow

/** Entrypoint executing the TIL-declared TPC-H-lite dataflow (q3lite) on
  * Spark at a given scale factor (default 0.1). Usage:
  * `spark-submit --class repro.jobs.PipelineJob <jar> [sf]`.
  */
object PipelineJob {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("tydi-pipeline")
      .getOrCreate()
    try {
      val li     = SynthData.lineitem(spark, sf)
      val orders = SynthData.orders(spark, sf)
      val t0     = System.nanoTime()
      val out    = TpchDataflow.execute(spark, li, orders)
      val n      = out.count()
      val ms     = (System.nanoTime() - t0) / 1e6
      println(f"q3lite @ SF=$sf: $n%d result groups in $ms%.0f ms")
      out.orderBy("l_orderkey", "o_orderdate").show(10, truncate = false)
    } finally spark.stop()
  }
}
