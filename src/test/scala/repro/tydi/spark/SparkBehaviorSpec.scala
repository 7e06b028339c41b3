package repro.tydi.spark

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.tydi.ir._
import repro.tydi.spec._
import repro.tydi.til.Parser
import repro.tydi.types._

/** The testing grammar of §6 running against Spark kernels: the same TIL
  * test declarations that drive the pure simulator drive DataFrame
  * transformations here.
  */
class SparkBehaviorSpec extends SparkSpec {

  private val bits2 = TStream(TBits(2), complexity = 2)
  private val adder = Streamlet("adder", Interface.of(
    Port("in1", In, bits2), Port("in2", In, bits2), Port("out", Out, bits2)))

  /** The adder as a Spark kernel: join the two input series on their
    * sequence number and add.
    */
  private val adderKernel = Kernel.of { (_, inputs) =>
    val a = inputs("in1").withColumnRenamed("value", "a")
    val b = inputs("in2").withColumnRenamed("value", "b")
    Map("out" -> a.join(b, "seq").select(col("seq"), (col("a") + col("b")) as "value"))
  }

  test("the §6.1 adder test passes against the Spark kernel") {
    val tf = Parser.parse("""namespace t {
      |type s = Stream(data: Bits(2), complexity: 2);
      |streamlet adder = (in1: in s, in2: in s, out: out s);
      |test adds on adder {
      |  adder.out = ("10", "01", "11");
      |  adder.in1 = ("01", "01", "10");
      |  adder.in2 = ("01", "00", "01");
      |}
      |}""".stripMargin)
    val behavior = new SparkBehavior(spark, adderKernel)
    assert(TestHarness.run(tf.tests.head, adder, behavior).isEmpty)
  }

  test("a broken Spark kernel fails the same test") {
    val broken = Kernel.of { (_, inputs) =>
      Map("out" -> inputs("in1")) // forgets to add
    }
    val tf = Parser.parse("""namespace t {
      |type s = Stream(data: Bits(2), complexity: 2);
      |streamlet adder = (in1: in s, in2: in s, out: out s);
      |test adds on adder {
      |  adder.out = ("10");
      |  adder.in1 = ("01");
      |  adder.in2 = ("01");
      |}
      |}""".stripMargin)
    val failures = TestHarness.run(tf.tests.head, adder, new SparkBehavior(spark, broken))
    assert(failures.nonEmpty)
  }

  test("toFrame/fromFrame round-trips flat series") {
    val b = new SparkBehavior(spark, adderKernel)
    val v = DSeq(Vector(DElem(1), DElem(2), DElem(3)))
    assert(b.fromFrame(b.toFrame(v)) == v)
  }

  test("toFrame/fromFrame round-trips dimensioned series as array columns") {
    val b = new SparkBehavior(spark, adderKernel)
    val v = DSeq(Vector(
      DSeq(Vector(DElem(1), DElem(0))),
      DSeq(Vector(DElem(0)))))
    assert(b.fromFrame(b.toFrame(v)) == v)
  }

  test("§6.2: a random generator plus a known-good software adder verify the adder under test") {
    // "a random number generator component could be paired with a known-good,
    // software-based adder to verify the results of an adder hardware design."
    val rngTil = """namespace verify {
      |type s = Stream(data: Bits(32), complexity: 2);
      |#generates pseudo-random input pairs#
      |streamlet rng = (n1: out s, n2: out s) { "test/rng" };
      |#the adder under test#
      |streamlet dut = (in1: in s, in2: in s, out: out s) { "hw/adder" };
      |#known-good software adder#
      |streamlet golden = (in1: in s, in2: in s, out: out s) { "sw/adder" };
      |}""".stripMargin
    val parsed = Parser.parse(rngTil).project
    val registry = new KernelRegistry()
      .register("test/rng", Kernel.of { (s, _) =>
        val base = s.range(0, 256).select(col("id") as "seq",
          pmod(hash(col("id")), lit(1 << 16)).cast("long") as "value")
        Map(
          "n1" -> base,
          "n2" -> s.range(0, 256).select(col("id") as "seq",
            pmod(hash(col("id") * 7 + 3), lit(1 << 16)).cast("long") as "value"))
      })
      .register("hw/adder", adderAsNamed("out"))
      .register("sw/adder", adderAsNamed("out"))
    val exec = new DataflowExecutor(parsed, registry)
    val rngOut = exec.execute(spark, Vector("verify"), "rng", Map.empty)
    val dutOut = exec.execute(spark, Vector("verify"), "dut",
      Map("in1" -> rngOut("n1"), "in2" -> rngOut("n2")))("out")
    val goldOut = exec.execute(spark, Vector("verify"), "golden",
      Map("in1" -> rngOut("n1"), "in2" -> rngOut("n2")))("out")
    assert(dutOut.exceptAll(goldOut).isEmpty)
    assert(goldOut.exceptAll(dutOut).isEmpty)
  }

  private def adderAsNamed(out: String): Kernel = Kernel.of { (_, inputs) =>
    val a = inputs("in1").withColumnRenamed("value", "a")
    val b = inputs("in2").withColumnRenamed("value", "b")
    Map(out -> a.join(b, "seq").select(col("seq"), (col("a") + col("b")) as "value"))
  }
}
