package repro.bench

import repro.SparkSpec
import repro.tydi.eval.Table1

/** Bench harness for Table 1 (paper §8.3): prints the paper's rows next to
  * the numbers measured by running this repo's toolchain (parse TIL ->
  * query system -> lowering -> VHDL emission -> line counting), and asserts
  * the published shape. Regenerate with: `sbt "bench/testOnly repro.bench.Table1Bench"`.
  */
class Table1Bench extends SparkSpec {

  test("Table 1: lines of code to represent an interface (paper vs measured)") {
    println()
    println("=" * 70)
    println("Table 1 — Lines of code to represent an interface")
    println("=" * 70)
    println(Table1.render)
    println()

    val m = Table1.measured.map(r => r.name -> r).toMap
    val p = Table1.paper.map(r => r.name -> r).toMap

    // Exact reproductions.
    assert(m("AXI4-Stream equiv. (TIL)").typeDecl.contains(15))
    assert(m("AXI4-Stream equiv. (TIL)").interface == 1)
    assert(m("AXI4-Stream equiv. (VHDL)").interface == 8)
    assert(m("AXI4-Stream").interface == 9)
    assert(m("AXI4").interface == 44)
    assert(m("AXI4 equiv. (TIL)").interface == 5)
    assert(m("AXI4 equiv. (TIL, Group)").interface == 1)

    // Near reproductions (TIL samples re-authored in the paper's style).
    assert(math.abs(m("AXI4 equiv. (TIL)").typeDecl.get - 48) <= 6)
    assert(math.abs(m("AXI4 equiv. (TIL, Group)").typeDecl.get - 59) <= 6)
    assert(math.abs(m("AXI4 equiv. (VHDL)").interface - 28) <= 2)

    // Shape: per-interface effort ordering matches the paper everywhere.
    def order(rows: Map[String, Table1.Row]) =
      rows.toVector.sortBy(_._2.interface).map(_._1)
    assert(order(m).indexOf("AXI4 equiv. (TIL, Group)") <
      order(m).indexOf("AXI4 equiv. (VHDL)"))
    assert(order(m).indexOf("AXI4 equiv. (VHDL)") < order(m).indexOf("AXI4"))
    assert(p.keySet == m.keySet)
  }
}
