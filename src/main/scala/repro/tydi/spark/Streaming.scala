package repro.tydi.spark

import java.nio.file.{Files, Path}
import java.util.UUID
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.streaming.Trigger

/** Runs a composed Tydi dataflow under Structured Streaming — the same
  * DataFrame transformation graph the batch executor produces is applied to
  * streaming sources, demonstrating that Streamlet composition is agnostic
  * to the execution mode (the repro's `distributed_dataflow` mapping:
  * composable typed dataflow operators over streams of records).
  *
  * Inputs are staged as parquet directories and read back with a file
  * streaming source; the pipeline's output is collected through a memory
  * sink with a single `AvailableNow` pass, so tests get deterministic,
  * bounded results.
  */
object StreamingRunner {

  /** Stage a batch frame as a streaming source (parquet file source). */
  def stageAsStream(spark: SparkSession, df: DataFrame, dir: Path): DataFrame = {
    df.write.mode("overwrite").parquet(dir.toString)
    spark.readStream.schema(df.schema).parquet(dir.toString)
  }

  /** Run `pipeline` over the given batch inputs in streaming mode and return
    * the fully-drained result as a batch DataFrame.
    *
    * @param outputMode "append" for stateless pipelines, "complete" for
    *                   streaming aggregations
    */
  def runOnce(
      spark: SparkSession,
      inputs: Map[String, DataFrame],
      outputMode: String,
  )(pipeline: Map[String, DataFrame] => DataFrame): DataFrame = {
    val base = Files.createTempDirectory("tydi-stream-")
    val streamingInputs = inputs.map { case (name, df) =>
      name -> stageAsStream(spark, df, base.resolve(name))
    }
    val out       = pipeline(streamingInputs)
    val queryName = "tydi_out_" + UUID.randomUUID().toString.replace("-", "")
    val query = out.writeStream
      .format("memory")
      .queryName(queryName)
      .outputMode(outputMode)
      .option("checkpointLocation", base.resolve("_checkpoint").toString)
      .trigger(Trigger.AvailableNow())
      .start()
    query.awaitTermination()
    spark.table(queryName)
  }
}
