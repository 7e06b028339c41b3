package repro.tydi.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.tydi.physical.PhysicalStream
import repro.tydi.transfer.Transfer

/** Transfer-level organization as *distributed* Dataset transformations:
  * the Spark rendition of the physical layer (paper Figure 1), for
  * dimensionality-1 streams at complexity 1 — the organization is then
  * unique (elements aligned to lane 0, full consecutive transfers, last
  * asserted per transfer), so the result is directly comparable with the
  * pure [[repro.tydi.transfer.Serializer]], which the test suite asserts.
  *
  * Element frames have columns `(seq, pos, v)`: sequence id, position within
  * the sequence, element value. Transfer frames have one row per (transfer,
  * lane): `(seq, t, lane, v, last, endi)` with `t` the transfer index within
  * the sequence.
  */
object TransferOps {

  /** Organize elements into complexity-1 transfers with `lanes` lanes. */
  def serializeC1(elements: DataFrame, lanes: Int): DataFrame = {
    require(lanes >= 1, "lanes must be >= 1")
    val bySeq = Window.partitionBy("seq")
    elements
      .withColumn("t", floor(col("pos") / lanes))
      .withColumn("lane", (col("pos") % lanes).cast("int"))
      .withColumn("maxpos", max("pos").over(bySeq))
      .withColumn("last", col("t") === floor(col("maxpos") / lanes))
      .withColumn("endi",
        when(col("last"), (col("maxpos") % lanes).cast("int")).otherwise(lit(lanes - 1)))
      .select("seq", "t", "lane", "v", "last", "endi")
  }

  /** Recover the element frame from a complexity-1 transfer frame. */
  def deserializeC1(transfers: DataFrame, lanes: Int): DataFrame =
    transfers.select(
      col("seq"),
      (col("t") * lanes + col("lane")).as("pos"),
      col("v"))

  /** Collect a transfer frame into signal-level [[Transfer]]s, ordered by
    * (seq, t) — the cross-check bridge to the pure simulator.
    */
  def collect(transfers: DataFrame, ps: PhysicalStream): Vector[Transfer] = {
    val rows = transfers
      .groupBy("seq", "t")
      .agg(
        collect_list(struct(col("lane"), col("v"))).as("lanesData"),
        max(col("last")).as("last"),
        max(col("endi")).as("endi"))
      .orderBy("seq", "t")
      .collect()
    rows.toVector.map { r =>
      val lanesData = r.getAs[collection.Seq[org.apache.spark.sql.Row]]("lanesData")
      val data = Array.fill[Option[BigInt]](ps.lanes)(None)
      lanesData.foreach { lr => data(lr.getInt(0)) = Some(BigInt(lr.getLong(1))) }
      val isLast = r.getAs[Boolean]("last")
      val lastBits =
        if (ps.dimensionality == 0) Vector.empty[Boolean]
        else Vector.tabulate(ps.dimensionality)(d => d == 0 && isLast)
      Transfer(data.toVector, lastBits, 0, r.getAs[Int]("endi"))
    }
  }

  /** Build an element frame from in-memory sequences. */
  def elementFrame(spark: SparkSession, seqs: Vector[Vector[Long]]): DataFrame = {
    import spark.implicits._
    seqs.zipWithIndex.flatMap { case (s, si) =>
      s.zipWithIndex.map { case (v, pi) => (si.toLong, pi.toLong, v) }
    }.toDF("seq", "pos", "v")
  }
}
