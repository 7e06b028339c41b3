package repro.tydi.spec

import repro.SparkSpec
import repro.tydi.ir._
import repro.tydi.til.Parser
import repro.tydi.types._

/** Codifies the testing grammar's semantics (paper §6) against pure
  * behaviors; the Spark equivalents run in
  * [[repro.tydi.spark.SparkBehaviorSpec]].
  */
class HarnessSpec extends SparkSpec {

  private val bits2 = TStream(TBits(2), complexity = 2)

  /** The paper's adder: out does not assert valid until it has received and
    * added two inputs; a pure function of the two input series.
    */
  private val adder = Streamlet("adder", Interface.of(
    Port("in1", In, bits2), Port("in2", In, bits2), Port("out", Out, bits2)))

  private val adderBehavior = Behavior.pure { driven =>
    val DSeq(a) = driven("in1"); val DSeq(b) = driven("in2")
    Map("out" -> DSeq(a.zip(b).map {
      case (DElem(x), DElem(y)) => DElem(x + y)
      case other                => fail(s"unexpected $other")
    }))
  }

  private def parseTests(til: String) = Parser.parse(til)

  test("the adder example from §6.1: parallel assertions, drive vs observe inferred") {
    val tf = parseTests("""namespace t {
      |type s = Stream(data: Bits(2), complexity: 2);
      |streamlet adder = (in1: in s, in2: in s, out: out s);
      |test adds on adder {
      |  adder.out = ("10", "01", "11");
      |  adder.in1 = ("01", "01", "10");
      |  adder.in2 = ("01", "00", "01");
      |}
      |}""".stripMargin)
    val failures = TestHarness.run(tf.tests.head, adder, adderBehavior)
    assert(failures.isEmpty)
  }

  test("a wrong expectation is reported with expected and observed values") {
    val tf = parseTests("""namespace t {
      |type s = Stream(data: Bits(2), complexity: 2);
      |streamlet adder = (in1: in s, in2: in s, out: out s);
      |test adds on adder {
      |  adder.out = ("11");
      |  adder.in1 = ("01");
      |  adder.in2 = ("01");
      |}
      |}""".stripMargin)
    val failures = TestHarness.run(tf.tests.head, adder, adderBehavior)
    assert(failures.size == 1)
    assert(failures.head.message.contains("expected [3]"))
    assert(failures.head.message.contains("observed [2]"))
  }

  test("declaration order does not matter — assertions are parallel (§6.1 property 1)") {
    val tf = parseTests("""namespace t {
      |type s = Stream(data: Bits(2), complexity: 2);
      |streamlet adder = (in1: in s, in2: in s, out: out s);
      |test adds on adder {
      |  adder.in1 = ("01");
      |  adder.out = ("10");
      |  adder.in2 = ("01");
      |}
      |}""".stripMargin)
    assert(TestHarness.run(tf.tests.head, adder, adderBehavior).isEmpty)
  }

  // ---- grouped transactions with Reversed children (§6.1 property 2) ----

  private val combined = {
    val req = TStream(TBits(2), complexity = 2)
    val rsp = TStream(TBits(2), complexity = 2, direction = Reverse)
    Streamlet("adder", Interface.of(
      Port("add", In, TStream(TGroup("in1" -> req, "in2" -> req, "out" -> rsp)))))
  }

  private val combinedBehavior = Behavior.pure { driven =>
    val DSeq(a) = driven("add.in1"); val DSeq(b) = driven("add.in2")
    Map("add.out" -> DSeq(a.zip(b).map {
      case (DElem(x), DElem(y)) => DElem(x + y)
      case other                => fail(s"unexpected $other")
    }))
  }

  test("a single port with a Reversed child stream carries both requests and the response") {
    val tf = parseTests("""namespace t {
      |type req = Stream(data: Bits(2), complexity: 2);
      |type rsp = Stream(data: Bits(2), complexity: 2, direction: Reverse);
      |type both = Stream(data: Group(in1: req, in2: req, out: rsp));
      |streamlet adder = (add: in both);
      |test adds on adder {
      |  add = {
      |    in1: ("01", "01", "10"),
      |    in2: ("01", "00", "01"),
      |    out: ("10", "01", "11"),
      |  };
      |}
      |}""".stripMargin)
    assert(TestHarness.run(tf.tests.head, combined, combinedBehavior).isEmpty)
  }

  test("drive/observe is decided per field: Reversed children of an in port are observed") {
    val iface = combined.interface
    assert(TestHarness.drives(iface,
      TestHarness.Target("add", Some("in1"), ElemLit("0"))) == Right(true))
    assert(TestHarness.drives(iface,
      TestHarness.Target("add", Some("out"), ElemLit("0"))) == Right(false))
  }

  test("unknown ports and fields are failures, not crashes") {
    val iface = combined.interface
    assert(TestHarness.drives(iface,
      TestHarness.Target("nope", None, ElemLit("0"))).isLeft)
    assert(TestHarness.drives(iface,
      TestHarness.Target("add", Some("bogus"), ElemLit("0"))).isLeft)
  }

  // ---- sequences (§6.1): the counter example ----

  private val bit  = TStream(TBits(1), complexity = 2)
  private val word = TStream(TBits(4), complexity = 2)
  private val counter = Streamlet("counter", Interface.of(
    Port("increment", In, bit), Port("count", Out, word)))

  /** "A counter which accumulates based on input transfers and always drives
    * its output with its current value."
    */
  private final class CounterBehavior extends StatefulBehavior {
    private var value = BigInt(0)
    override def reset(): Unit = value = 0
    override def evaluate(driven: Map[String, DataValue]): Map[String, DataValue] = {
      driven.get("increment").foreach {
        case DElem(_)    => value += 1
        case DSeq(items) => value += items.size
      }
      Map("count" -> DElem(value))
    }
  }

  test("the counter example from §6.1: stages run in order against state") {
    val tf = parseTests("""namespace t {
      |type b = Stream(data: Bits(1), complexity: 2);
      |type w = Stream(data: Bits(4), complexity: 2);
      |streamlet counter = (increment: in b, count: out w);
      |test counting on counter {
      |  sequence "sequence name" {
      |    "initial state": { counter.count = "0000"; },
      |    "increment": { counter.increment = "1"; },
      |    "result state": { counter.count = "0001"; },
      |  };
      |}
      |}""".stripMargin)
    assert(TestHarness.run(tf.tests.head, counter, new CounterBehavior).isEmpty)
  }

  test("a failing stage stops the sequence — later stages are not evaluated") {
    val tf = parseTests("""namespace t {
      |type b = Stream(data: Bits(1), complexity: 2);
      |type w = Stream(data: Bits(4), complexity: 2);
      |streamlet counter = (increment: in b, count: out w);
      |test counting on counter {
      |  sequence "s" {
      |    "wrong": { counter.count = "1111"; },
      |    "would increment": { counter.increment = "1"; },
      |    "never checked": { counter.count = "0001"; },
      |  };
      |}
      |}""".stripMargin)
    val behavior = new CounterBehavior
    val failures = TestHarness.run(tf.tests.head, counter, behavior)
    assert(failures.size == 1)
    assert(failures.head.context.contains("wrong"))
    // The increment stage did not run: state still 0.
    assert(behavior.evaluate(Map.empty)("count") == DElem(0))
  }

  test("state is reset between runs of a stateful behavior") {
    val tf = parseTests("""namespace t {
      |type b = Stream(data: Bits(1), complexity: 2);
      |type w = Stream(data: Bits(4), complexity: 2);
      |streamlet counter = (increment: in b, count: out w);
      |test counting on counter {
      |  sequence "s" {
      |    "a": { counter.increment = "1"; },
      |    "b": { counter.count = "0001"; },
      |  };
      |}
      |}""".stripMargin)
    val behavior = new CounterBehavior
    assert(TestHarness.run(tf.tests.head, counter, behavior).isEmpty)
    assert(TestHarness.run(tf.tests.head, counter, behavior).isEmpty) // reset applied
  }

  test("a behavior exception becomes a test failure") {
    val boom = Behavior.pure(_ => throw new IllegalStateException("kaput"))
    val tf = parseTests("""namespace t {
      |type s = Stream(data: Bits(2), complexity: 2);
      |streamlet adder = (in1: in s, in2: in s, out: out s);
      |test adds on adder { adder.out = ("01"); }
      |}""".stripMargin)
    val failures = TestHarness.run(tf.tests.head, adder, boom)
    assert(failures.exists(_.message.contains("kaput")))
  }

  test("a missing observed transaction is a failure") {
    val silent = Behavior.pure(_ => Map.empty)
    val tf = parseTests("""namespace t {
      |type s = Stream(data: Bits(2), complexity: 2);
      |streamlet adder = (in1: in s, in2: in s, out: out s);
      |test adds on adder { adder.out = ("01"); }
      |}""".stripMargin)
    val failures = TestHarness.run(tf.tests.head, adder, silent)
    assert(failures.exists(_.message.contains("no transaction observed")))
  }

  // ---- substitutions (§6.2) ----

  test("a Streamlet's implementation can be substituted behind the same Interface") {
    val original = Streamlet("dep", Interface.of(Port("p", In, bits2)),
      Some(LinkedImpl("hw/real")))
    val project = Project.of(Namespace(Vector("t"), streamlets = Map("dep" -> original)))
    val mock = Streamlet("dep_mock", Interface.of(Port("p", In, bits2)),
      Some(LinkedImpl("test/mock")))
    val substituted = Substitute.impl(project, Ref(Vector("t"), "dep"), mock)
    assert(substituted.namespaces.head.streamlets("dep").impl.contains(LinkedImpl("test/mock")))
    // The original project is untouched (substitution is a new Project).
    assert(project.namespaces.head.streamlets("dep").impl.contains(LinkedImpl("hw/real")))
  }

  test("a substitute with a different Interface is rejected") {
    val original = Streamlet("dep", Interface.of(Port("p", In, bits2)))
    val project = Project.of(Namespace(Vector("t"), streamlets = Map("dep" -> original)))
    val wrong = Streamlet("dep_mock", Interface.of(Port("q", In, bits2)))
    intercept[Substitute.SubstituteError](
      Substitute.impl(project, Ref(Vector("t"), "dep"), wrong))
  }

  test("substituting an unknown streamlet is rejected") {
    val project = Project.of(Namespace(Vector("t")))
    intercept[Substitute.SubstituteError](
      Substitute.impl(project, Ref(Vector("t"), "ghost"),
        Streamlet("x", Interface.of())))
  }
}
