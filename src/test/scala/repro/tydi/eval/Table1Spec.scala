package repro.tydi.eval

import repro.SparkSpec
import repro.tydi.query.Queries
import repro.tydi.til.Parser

/** Reproduction checks for Table 1 (paper §8.3). Absolute TIL line counts
  * may differ by a few lines from the paper (the samples are re-authored in
  * the paper's style), but the AXI4-Stream figures are exact and the table's
  * shape — which representation wins and by what kind of factor — must hold.
  */
class Table1Spec extends SparkSpec {

  private def row(name: String) = Table1.measured.find(_.name == name).get
  private def paperRow(name: String) = Table1.paper.find(_.name == name).get

  test("every TIL sample parses and validates cleanly") {
    for (src <- Seq(TilSamples.axi4Stream, TilSamples.axi4, TilSamples.axi4Group,
                    TilSamples.paperExample)) {
      val q = Queries.forProject(Parser.parse(src).project)
      assert(q.validationErrors.isEmpty, src.linesIterator.next())
    }
  }

  test("AXI4-Stream equiv. (TIL): exactly the paper's 15 type lines and 1 interface line") {
    val m = row("AXI4-Stream equiv. (TIL)")
    assert(m.typeDecl.contains(15))
    assert(m.interface == 1)
  }

  test("AXI4-Stream equiv. (VHDL): exactly the paper's 8 signals (Listing 4)") {
    assert(row("AXI4-Stream equiv. (VHDL)").interface == 8)
  }

  test("AXI4-Stream native standard: exactly 9 signals") {
    assert(row("AXI4-Stream").interface == 9)
    assert(NativeStandards.axi4StreamSignals.size == 9)
  }

  test("AXI4 native standard: exactly 44 signals") {
    assert(row("AXI4").interface == 44)
    assert(NativeStandards.axi4Signals.size == 44)
    assert(NativeStandards.axi4Signals.distinct.size == 44)
  }

  test("AXI4 equiv. (TIL): 5 ports, one line each") {
    assert(row("AXI4 equiv. (TIL)").interface == 5)
  }

  test("AXI4 equiv. (TIL, Group): a single port line") {
    assert(row("AXI4 equiv. (TIL, Group)").interface == 1)
  }

  test("AXI4 type declarations are within a few lines of the paper's 48/59") {
    assert(math.abs(row("AXI4 equiv. (TIL)").typeDecl.get - 48) <= 6)
    assert(math.abs(row("AXI4 equiv. (TIL, Group)").typeDecl.get - 59) <= 6)
  }

  test("AXI4 equiv. (VHDL) is within a couple of signals of the paper's 28") {
    assert(math.abs(row("AXI4 equiv. (VHDL)").interface - 28) <= 2)
  }

  test("shape: TIL needs far fewer interface lines than VHDL signals") {
    // "the number of lines of code for a VHDL AXI4 equivalent representation
    // is 28 compared to only a single line of code for TIL" (per port).
    assert(row("AXI4 equiv. (TIL, Group)").interface * 20 <=
      row("AXI4 equiv. (VHDL)").interface)
    assert(row("AXI4-Stream equiv. (TIL)").interface * 8 <=
      row("AXI4-Stream equiv. (VHDL)").interface)
  }

  test("shape: the VHDL equivalent tracks the native standard's signal count") {
    assert(row("AXI4 equiv. (VHDL)").interface < row("AXI4").interface)
    assert(math.abs(row("AXI4-Stream equiv. (VHDL)").interface -
      row("AXI4-Stream").interface) <= 1)
  }

  test("shape: Group variant trades more type lines (once) for fewer ports") {
    val multi = row("AXI4 equiv. (TIL)")
    val group = row("AXI4 equiv. (TIL, Group)")
    assert(group.typeDecl.get > multi.typeDecl.get)
    assert(group.interface < multi.interface)
  }

  test("the Group variant produces the same physical streams as the multi-port variant") {
    val q1 = Queries.forProject(Parser.parse(TilSamples.axi4).project)
    val q2 = Queries.forProject(Parser.parse(TilSamples.axi4Group).project)
    val multi = q1.allStreamlets.head._2.interface
    val group = q2.allStreamlets.head._2.interface
    val multiPhys = multi.ports.flatMap(p => q1.physicalStreams(p.tpe))
    val groupPhys = group.ports.flatMap(p => q2.physicalStreams(p.tpe))
    // Same signal shapes, channel for channel (paths differ: bundle fields
    // vs port names; B/R reversal shows as `reversed` in the bundle).
    assert(multiPhys.size == groupPhys.size)
    val m = multiPhys.map(ps => (ps.elementWidth, ps.lanes, ps.dimensionality,
      ps.complexity, ps.userWidth)).sortBy(_.toString)
    val g = groupPhys.map(ps => (ps.elementWidth, ps.lanes, ps.dimensionality,
      ps.complexity, ps.userWidth)).sortBy(_.toString)
    assert(m == g)
  }

  test("paper rows and measured rows align one to one") {
    assert(Table1.paper.map(_.name) == Table1.measured.map(_.name))
    assert(Table1.paper.map(_.typeDecl.isDefined) ==
      Table1.measured.map(_.typeDecl.isDefined))
  }

  test("render produces one line per row plus headers") {
    val text = Table1.render
    Table1.paper.foreach(r => assert(text.contains(r.name)))
  }

  // ---- Loc counting unit tests ----

  test("typeDeclLines counts only type-declaration lines, skipping comments/blanks") {
    val src = """namespace x {
      |// a comment
      |type a = Bits(4);
      |
      |type b = Group(
      |    f: Bits(1),
      |);
      |streamlet s = (p: in a);
      |}""".stripMargin
    // 'type a' line + 3 lines of 'type b'.
    assert(Loc.typeDeclLines(src) == 4)
  }

  test("interfacePortLines counts one line per port") {
    val src = """namespace x {
      |streamlet s = (
      |    a: in t,
      |    // comment
      |    b: out t,
      |);
      |}""".stripMargin
    assert(Loc.interfacePortLines(src) == 2)
  }

  test("total counts significant lines") {
    assert(Loc.total("a\n\n// c\nb\n") == 2)
  }
}
