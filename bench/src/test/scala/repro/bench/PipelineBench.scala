package repro.bench

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthData}
import repro.tydi.spark.TpchDataflow

/** Substrate-validation bench (DESIGN.md §Beyond-paper, EXPERIMENTS.md §B):
  * the TIL-declared q3lite dataflow at SF=0.1 against the hand-fused Spark
  * baseline. The paper claims the IR costs nothing at runtime — Streamlet
  * composition must lower to the same kind of Catalyst plan the monolithic
  * query gets, so row counts must be identical and wall-clock in the same
  * ballpark. Regenerate with: `sbt "bench/testOnly repro.bench.PipelineBench"`.
  */
class PipelineBench extends SparkSpec {

  private val sf = sys.env.getOrElse("BENCH_SF", "0.1").toDouble

  private def timed[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val r  = body
    (r, (System.nanoTime() - t0) / 1e6)
  }

  private def run(df: => DataFrame): (Long, Double) = {
    val (n, ms) = timed(df.count())
    (n, ms)
  }

  test(s"q3lite composed-vs-monolithic at SF=$sf: identical results, comparable time") {
    val li     = SynthData.lineitem(spark, sf).cache()
    val orders = SynthData.orders(spark, sf).cache()
    li.count(); orders.count() // materialize inputs outside the timed region

    // Warm-up both plans once (codegen, shuffle services).
    TpchDataflow.execute(spark, li, orders).count()
    TpchDataflow.monolithic(spark, li, orders).count()

    val (nComposed, tComposed) = run(TpchDataflow.execute(spark, li, orders))
    val (nFused, tFused)       = run(TpchDataflow.monolithic(spark, li, orders))

    println()
    println("=" * 70)
    println(f"q3lite @ SF=$sf%.2f (lineitem=${li.count()}%d rows)")
    println("=" * 70)
    println(f"  IR-composed dataflow : $nComposed%10d groups  $tComposed%8.0f ms")
    println(f"  hand-fused baseline  : $nFused%10d groups  $tFused%8.0f ms")
    println(f"  composed/fused time ratio: ${tComposed / tFused}%.2f")
    println()

    assert(nComposed == nFused, "composed and fused pipelines must agree")
    // Composition through the IR lowers to one Catalyst plan; allow generous
    // headroom for plan-shape noise but catch anything pathological.
    assert(tComposed <= tFused * 3 + 2000,
      f"composed pipeline unexpectedly slow: $tComposed%.0f ms vs $tFused%.0f ms")

    li.unpersist(); orders.unpersist()
  }

  test("transfer-count shape from Figure 1: higher complexity wastes no lanes") {
    import repro.tydi.spec.{DElem, DSeq, DataValue}
    import repro.tydi.transfer.{Serializer, TransferFixtures}
    // Many short sequences over a wide stream: C1 pays one transfer series
    // per sequence (alignment + per-transfer last), C8 packs across
    // boundaries. The ratio grows with lanes/sequence-length.
    val lanes = 8
    val seqs: Vector[DataValue] = Vector.tabulate(256) { i =>
      DSeq(Vector.tabulate(1 + i % 3)(j => DElem(BigInt(i * 10 + j))))
    }
    val c1 = Serializer.serialize(TransferFixtures.ps(lanes, 1, 1), seqs).size
    val c8 = Serializer.serialize(TransferFixtures.ps(lanes, 1, 8), seqs).size
    val elems = seqs.map(_.flatten.size).sum
    println(f"Figure-1 shape: $elems elems, $lanes lanes -> C1: $c1%4d transfers, C8: $c8%4d transfers (${c1.toDouble / c8}%.1fx)")
    assert(c8 <= (elems + lanes - 1) / lanes + 1) // near-perfect packing
    assert(c1 >= seqs.size)                       // at least one transfer per sequence
    assert(c1 > 2 * c8)                           // the Figure 1 win
  }
}
