package repro.tydi.til

import repro.SparkSpec
import repro.tydi.ir._
import repro.tydi.types._

/** Printing a Project to TIL and re-parsing yields the same Project:
  * the text form and the query-system form are interchangeable (§7.2).
  */
class PrinterSpec extends SparkSpec {

  private def roundTrip(p: Project): Project = Parser.parse(Printer.print(p)).project

  test("a streamlet with ports, docs, domains and structure round-trips") {
    val s = TStream(TBits(8), complexity = 2)
    val leaf = Streamlet("leaf", Interface.of(Port("x", In, s), Port("y", Out, s)))
    val top = Streamlet("top",
      Interface(Vector(
        Port("a", In, s, doc = Some("input port")),
        Port("b", Out, s))),
      Some(StructuralImpl(
        Vector(Instance("i", Ref.local("leaf"))),
        Vector(
          Connection(ParentPort("a"), InstancePort("i", "x")),
          Connection(InstancePort("i", "y"), ParentPort("b"))))),
      doc = Some("the top-level design"))
    val p = Project.of(Namespace(Vector("rt"),
      streamlets = Map("leaf" -> leaf, "top" -> top)))
    assert(roundTrip(p) == p)
  }

  test("all Stream properties survive the round-trip") {
    val s = TStream(
      data = TUnion("data" -> TBits(8), "null" -> TNull),
      throughput = Rational(128),
      dimensionality = 2,
      synchronicity = FlatDesync,
      complexity = 7,
      direction = Reverse,
      user = Some(TGroup("TID" -> TBits(8))),
      keep = true)
    val p = Project.of(Namespace(Vector("rt"),
      streamlets = Map("c" -> Streamlet("c", Interface.of(Port("p", In, s))))))
    assert(roundTrip(p) == p)
  }

  test("fractional throughput round-trips through the decimal syntax") {
    val s = TStream(TBits(4), throughput = Rational(3, 2))
    val p = Project.of(Namespace(Vector("rt"),
      streamlets = Map("c" -> Streamlet("c", Interface.of(Port("p", In, s))))))
    assert(roundTrip(p) == p)
  }

  test("linked implementations and impl declarations round-trip") {
    val s = TStream(TBits(1))
    val p = Project.of(Namespace(Vector("rt"),
      streamlets = Map("c" -> Streamlet("c", Interface.of(Port("p", In, s)),
        Some(LinkedImpl("./some/dir")))),
      impls = Map("shared" -> LinkedImpl("./other"))))
    assert(roundTrip(p) == p)
  }

  test("interface declarations with domains round-trip") {
    val s = TStream(TBits(1))
    val i = Interface(
      Vector(Port("a", In, s, domain = Some("fast"))),
      domains = Vector("fast"))
    val p = Project.of(Namespace(Vector("rt"), interfaces = Map("io" -> i)))
    assert(roundTrip(p) == p)
  }

  test("instance domain maps round-trip in both syntactic forms") {
    val s = TStream(TBits(1))
    val leaf = Streamlet("leaf",
      Interface(Vector(Port("x", In, s, domain = Some("d"))), domains = Vector("d")))
    val top = Streamlet("top",
      Interface(Vector(Port("a", In, s, domain = Some("d"))), domains = Vector("d")),
      Some(StructuralImpl(
        Vector(Instance("i", Ref.local("leaf"), Map("d" -> "d"))),
        Vector(Connection(ParentPort("a"), InstancePort("i", "x"))))))
    val p = Project.of(Namespace(Vector("rt"),
      streamlets = Map("leaf" -> leaf, "top" -> top)))
    assert(roundTrip(p) == p)
  }

  test("printed types are structural — names do not resurface") {
    val printed = Printer.printType(TStream(TBits(8), complexity = 3))
    assert(printed == "Stream(data: Bits(8), complexity: 3)")
  }

  test("default Stream properties are omitted from the printed form") {
    assert(Printer.printType(TStream(TBits(1))) == "Stream(data: Bits(1))")
  }
}
