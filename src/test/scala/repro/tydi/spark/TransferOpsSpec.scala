package repro.tydi.spark

import repro.SparkSpec
import repro.tydi.spec.{DElem, DSeq, DataValue}
import repro.tydi.transfer.{Deserializer, Serializer, TransferFixtures}

/** The distributed transfer organizer against the pure simulator: the same
  * complexity-1 organization computed as Dataset transformations must equal
  * the reference implementation, transfer for transfer.
  */
class TransferOpsSpec extends SparkSpec {

  private def seqsToValues(seqs: Vector[Vector[Long]]): Vector[DataValue] =
    seqs.map(s => DSeq(s.map(v => DElem(BigInt(v)): DataValue)))

  test("Spark C1 serialization equals the pure serializer (Figure 1 data)") {
    val seqs = Vector(
      "Hello".map(_.toLong).toVector,
      "World".map(_.toLong).toVector)
    val ps = TransferFixtures.ps(lanes = 3, dim = 1, c = 1)
    val sparkTransfers = TransferOps.collect(
      TransferOps.serializeC1(TransferOps.elementFrame(spark, seqs), 3), ps)
    val pureTransfers = Serializer.serialize(ps, seqsToValues(seqs))
    assert(sparkTransfers == pureTransfers)
  }

  test("Spark C1 serialization equals the pure serializer across lane counts") {
    val seqs = Vector(
      (1L to 7L).toVector,
      Vector(42L),
      (10L to 13L).toVector)
    for (lanes <- Seq(1, 2, 4, 8)) {
      val ps = TransferFixtures.ps(lanes = lanes, dim = 1, c = 1)
      val sparkTransfers = TransferOps.collect(
        TransferOps.serializeC1(TransferOps.elementFrame(spark, seqs), lanes), ps)
      val pureTransfers = Serializer.serialize(ps, seqsToValues(seqs))
      assert(sparkTransfers == pureTransfers, s"lanes=$lanes")
    }
  }

  test("Spark serialize/deserialize round-trips the element frame") {
    val seqs = Vector((1L to 10L).toVector, (20L to 23L).toVector)
    val elems = TransferOps.elementFrame(spark, seqs)
    val back = TransferOps.deserializeC1(TransferOps.serializeC1(elems, 4), 4)
    assert(back.exceptAll(elems).isEmpty)
    assert(elems.exceptAll(back).isEmpty)
  }

  test("the pure deserializer accepts the Spark-organized transfers") {
    val seqs = Vector((1L to 5L).toVector, (6L to 7L).toVector)
    val ps = TransferFixtures.ps(lanes = 2, dim = 1, c = 1)
    val transfers = TransferOps.collect(
      TransferOps.serializeC1(TransferOps.elementFrame(spark, seqs), 2), ps)
    assert(Deserializer.deserialize(ps, transfers) == seqsToValues(seqs))
  }

  test("transfer counts match the C1 arithmetic: ceil(len/lanes) per sequence") {
    val seqs  = Vector((1L to 9L).toVector, (1L to 4L).toVector, Vector(1L))
    val lanes = 4
    val n = TransferOps.serializeC1(TransferOps.elementFrame(spark, seqs), lanes)
      .select("seq", "t").distinct().count()
    assert(n == seqs.map(s => (s.size + lanes - 1) / lanes).sum)
  }
}
