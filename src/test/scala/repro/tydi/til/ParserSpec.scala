package repro.tydi.til

import repro.SparkSpec
import repro.tydi.ir._
import repro.tydi.spec._
import repro.tydi.types._

class ParserSpec extends SparkSpec {

  private def ns(src: String): Namespace = Parser.parse(src).project.namespaces.head

  // ---- namespaces ----

  test("namespace paths use :: separators and are purely abstract (§7.2)") {
    val n = ns("namespace example::name::space { }")
    assert(n.path == Vector("example", "name", "space"))
  }

  test("multiple namespaces in one source") {
    val p = Parser.parse("namespace a { } namespace b { }").project
    assert(p.namespaces.map(_.pathName) == Vector("a", "b"))
  }

  // ---- types ----

  test("the five logical types parse") {
    val n = ns("""namespace t {
      |type a = Null;
      |type b = Bits(7);
      |type c = Group(x: Bits(1), y: Null);
      |type d = Union(x: Bits(8), y: Null);
      |type e = Stream(data: Bits(4));
      |}""".stripMargin)
    assert(n.types("a") == TNull)
    assert(n.types("b") == TBits(7))
    assert(n.types("c") == TGroup("x" -> TBits(1), "y" -> TNull))
    assert(n.types("d") == TUnion("x" -> TBits(8), "y" -> TNull))
    assert(n.types("e") == TStream(TBits(4)))
  }

  test("all Stream properties parse, in any order") {
    val n = ns("""namespace t {
      |type s = Stream(
      |  complexity: 7,
      |  data: Bits(8),
      |  throughput: 128.0,
      |  dimensionality: 2,
      |  synchronicity: Desync,
      |  direction: Reverse,
      |  user: Bits(3),
      |  keep: true,
      |);
      |}""".stripMargin)
    val s = n.types("s").asInstanceOf[TStream]
    assert(s.data == TBits(8))
    assert(s.throughput == Rational(128))
    assert(s.dimensionality == 2)
    assert(s.synchronicity == Desync)
    assert(s.complexity == 7)
    assert(s.direction == Reverse)
    assert(s.user.contains(TBits(3)))
    assert(s.keep)
  }

  test("type identifiers resolve and are erased — only structure is stored (§4.2.2)") {
    val n = ns("""namespace t {
      |type byte = Bits(8);
      |type s = Stream(data: byte);
      |}""".stripMargin)
    assert(n.types("s") == TStream(TBits(8)))
  }

  test("types resolve across namespaces by qualified path") {
    val p = Parser.parse("""namespace lib { type byte = Bits(8); }
      |namespace use { type s = Stream(data: lib::byte); }
      |""".stripMargin).project
    assert(p.namespace(Vector("use")).get.types("s") == TStream(TBits(8)))
  }

  test("unknown type references are an error with position") {
    val e = intercept[ParseError](Parser.parse("namespace t { type s = Stream(data: nope); }"))
    assert(e.message.contains("unknown type"))
  }

  test("duplicate type declarations are rejected") {
    intercept[ParseError](
      Parser.parse("namespace t { type a = Null; type a = Null; }"))
  }

  test("a Stream requires a data property") {
    val e = intercept[ParseError](Parser.parse("namespace t { type s = Stream(complexity: 2); }"))
    assert(e.message.contains("data"))
  }

  test("trailing commas are allowed in field and property lists") {
    ns("""namespace t { type g = Group(a: Bits(1), b: Bits(2),); }""")
  }

  // ---- interfaces and streamlets ----

  test("Listing 3: the AXI4-Stream declaration parses to the expected type") {
    val n = ns(repro.tydi.eval.TilSamples.axi4Stream
      .replace("namespace repro::axi", "namespace t"))
    val s = n.types("axi4stream").asInstanceOf[TStream]
    assert(s.data == TUnion("data" -> TBits(8), "null" -> TNull))
    assert(s.throughput == Rational(128))
    assert(s.dimensionality == 1)
    assert(s.complexity == 7)
    assert(s.user.contains(TGroup("TID" -> TBits(8), "TDEST" -> TBits(4), "TUSER" -> TBits(1))))
    val sl = n.streamlets("example")
    assert(sl.interface.ports.map(p => (p.name, p.direction)) ==
      Vector(("axi4stream", In)))
  }

  test("interfaces declare separately and attach to streamlets by name") {
    val n = ns("""namespace t {
      |type s = Stream(data: Bits(1));
      |interface io = (a: in s, b: out s);
      |streamlet comp = io;
      |}""".stripMargin)
    assert(n.interfaces("io").ports.size == 2)
    assert(n.streamlets("comp").interface == n.interfaces("io"))
  }

  test("subsetting: a streamlet identifier in interface position yields its interface (§5)") {
    val n = ns("""namespace t {
      |type s = Stream(data: Bits(1));
      |streamlet original = (a: in s, b: out s);
      |interface sub = original;
      |streamlet alternate = original;
      |}""".stripMargin)
    assert(n.interfaces("sub").ports.map(_.name) == Vector("a", "b"))
    assert(n.streamlets("alternate").interface.ports.map(_.name) == Vector("a", "b"))
  }

  test("ports must carry Stream types") {
    val e = intercept[ParseError](
      Parser.parse("namespace t { streamlet c = (a: in Bits(4)); }"))
    assert(e.message.contains("must carry a Stream type"))
  }

  test("interface domains: declaration list and per-port assignment (§7.2)") {
    val n = ns("""namespace t {
      |type s = Stream(data: Bits(1));
      |interface io = <'fast, 'slow>(a: in s 'fast, b: out s 'slow);
      |}""".stripMargin)
    val io = n.interfaces("io")
    assert(io.domains == Vector("fast", "slow"))
    assert(io.ports.map(_.domain) == Vector(Some("fast"), Some("slow")))
  }

  // ---- documentation (§7.2, Listing 1) ----

  test("Listing 1: documentation attaches to streamlets and ports; comments vanish") {
    val n = ns(repro.tydi.eval.TilSamples.paperExample
      .replace("namespace my::example::space", "namespace t"))
    val sl = n.streamlets("comp1")
    assert(sl.doc.contains("documentation (optional)"))
    assert(sl.interface.port("a").get.doc.isEmpty)
    assert(sl.interface.port("c").get.doc.contains("this is port\ndocumentation"))
  }

  // ---- implementations (§5, §7.2) ----

  test("linked implementations enclose a directory path in double quotes") {
    val n = ns("""namespace t {
      |impl behav = "./path/to/directory";
      |}""".stripMargin)
    assert(n.impls("behav") == LinkedImpl("./path/to/directory"))
  }

  test("structural implementations: instances and connections") {
    val n = ns("""namespace t {
      |type s = Stream(data: Bits(1));
      |streamlet leaf = (x: in s, y: out s);
      |streamlet top = (a: in s, b: out s) {
      |  inst = leaf;
      |  a -- inst.x;
      |  inst.y -- b;
      |};
      |}""".stripMargin)
    val impl = n.streamlets("top").impl.get.asInstanceOf[StructuralImpl]
    assert(impl.instances == Vector(Instance("inst", Ref.local("leaf"))))
    assert(impl.connections == Vector(
      Connection(ParentPort("a"), InstancePort("inst", "x")),
      Connection(InstancePort("inst", "y"), ParentPort("b"))))
  }

  test("instance domain assignment: bare 'dom and 'a = 'b forms") {
    val n = ns("""namespace t {
      |type s = Stream(data: Bits(1));
      |streamlet leaf = <'d1, 'd2>(x: in s 'd1, y: out s 'd2);
      |streamlet top = <'p1, 'd2>(a: in s 'p1, b: out s 'd2) {
      |  inst = leaf<'d1 = 'p1, 'd2>;
      |  a -- inst.x;
      |  inst.y -- b;
      |};
      |}""".stripMargin)
    val impl = n.streamlets("top").impl.get.asInstanceOf[StructuralImpl]
    assert(impl.instances.head.domainMap == Map("d1" -> "p1", "d2" -> "d2"))
  }

  test("a streamlet can attach a linked impl or a named impl reference") {
    val n = ns("""namespace t {
      |type s = Stream(data: Bits(1));
      |impl shared = "./dir";
      |streamlet a = (p: in s) { "./direct" };
      |streamlet b = (p: in s) { shared };
      |}""".stripMargin)
    assert(n.streamlets("a").impl.contains(LinkedImpl("./direct")))
    assert(n.streamlets("b").impl.contains(ImplRef(Ref.local("shared"))))
  }

  // ---- test declarations (§6) ----

  test("the adder example: parallel port assertions (§6.1)") {
    val tf = Parser.parse("""namespace t {
      |type s = Stream(data: Bits(2));
      |streamlet adder = (in1: in s, in2: in s, out: out s);
      |test adder_works on adder {
      |  adder.out = ("10", "01", "11");
      |  adder.in1 = ("01", "01", "10");
      |  adder.in2 = ("01", "00", "01");
      |}
      |}""".stripMargin)
    val t = tf.tests.head
    assert(t.name == "adder_works")
    assert(t.uut == Ref.local("adder"))
    assert(t.stmts == Vector(
      PortAssert("out", SeriesLit(Vector(ElemLit("10"), ElemLit("01"), ElemLit("11")))),
      PortAssert("in1", SeriesLit(Vector(ElemLit("01"), ElemLit("01"), ElemLit("10")))),
      PortAssert("in2", SeriesLit(Vector(ElemLit("01"), ElemLit("00"), ElemLit("01"))))))
  }

  test("square brackets indicate dimensionality (§6.1)") {
    val tf = Parser.parse("""namespace t {
      |type s = Stream(data: Bits(1), dimensionality: 2, complexity: 4);
      |streamlet c = (p: in s);
      |test dims on c { p = [["1", "0"], ["0"]]; }
      |}""".stripMargin)
    assert(tf.tests.head.stmts.head == PortAssert("p",
      DimLit(Vector(
        DimLit(Vector(ElemLit("1"), ElemLit("0"))),
        DimLit(Vector(ElemLit("0")))))))
  }

  test("grouped per-field transactions for ports with Reversed children (§6.1)") {
    val tf = Parser.parse("""namespace t {
      |type req = Stream(data: Bits(2), complexity: 2);
      |type rsp = Stream(data: Bits(2), complexity: 2, direction: Reverse);
      |type both = Stream(data: Group(in1: req, in2: req, out: rsp), complexity: 2);
      |streamlet adder = (add: in both);
      |test grouped on adder {
      |  add = { in1: ("01"), in2: ("01"), out: ("10") };
      |}
      |}""".stripMargin)
    val FieldLit(fields) = tf.tests.head.stmts.head.asInstanceOf[PortAssert].data
    assert(fields.map(_._1) == Vector("in1", "in2", "out"))
  }

  test("the counter example: sequences of explicit stages (§6.1)") {
    val tf = Parser.parse("""namespace t {
      |type s = Stream(data: Bits(4), complexity: 2);
      |type b = Stream(data: Bits(1), complexity: 2);
      |streamlet counter = (increment: in b, count: out s);
      |test counting on counter {
      |  sequence "sequence name" {
      |    "initial state": { counter.count = "0000"; },
      |    "increment": { counter.increment = "1"; },
      |    "result state": { counter.count = "0001"; },
      |  };
      |}
      |}""".stripMargin)
    val seq = tf.tests.head.stmts.head.asInstanceOf[SequenceAssert]
    assert(seq.name == "sequence name")
    assert(seq.stages.map(_._1) == Vector("initial state", "increment", "result state"))
    assert(seq.stages(0)._2 == Vector(PortAssert("count", ElemLit("0000"))))
    assert(seq.stages(1)._2 == Vector(PortAssert("increment", ElemLit("1"))))
    assert(seq.stages(2)._2 == Vector(PortAssert("count", ElemLit("0001"))))
  }

  test("tests are collected outside the Project — never in backend output (§6.2)") {
    val tf = Parser.parse("""namespace t {
      |type s = Stream(data: Bits(1));
      |streamlet c = (p: in s);
      |test x on c { p = "1"; }
      |}""".stripMargin)
    assert(tf.tests.size == 1)
    assert(tf.project.namespaces.head.streamlets.size == 1)
  }

  // ---- errors ----

  test("parse errors carry a position and an expectation") {
    val e = intercept[ParseError](Parser.parse("namespace t { type = Null; }"))
    assert(e.message.contains("expected identifier"))
  }

  test("unknown Stream properties are rejected") {
    val e = intercept[ParseError](
      Parser.parse("namespace t { type s = Stream(data: Null, wibble: 3); }"))
    assert(e.message.contains("unknown Stream property"))
  }

  test("duplicate streamlet declarations are rejected") {
    intercept[ParseError](Parser.parse(
      """namespace t {
        |type s = Stream(data: Bits(1));
        |streamlet c = (p: in s);
        |streamlet c = (p: in s);
        |}""".stripMargin))
  }
}
