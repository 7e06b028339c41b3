package repro.tydi.eval

import repro.tydi.backend.vhdl.VhdlBackend
import repro.tydi.query.Queries
import repro.tydi.til.Parser

/** Reproduces Table 1 of paper §8.3: "Lines of code to represent an
  * interface in TIL, compared to the resulting number of signals in VHDL or
  * for an equivalent interface standard." Every measured number comes from
  * running the actual toolchain: the TIL samples are parsed, lowered through
  * the query system and emitted by the VHDL backend; native-standard counts
  * come from the AMBA signal lists.
  */
object Table1 {

  /** One table row: `typeDecl` is None for rows where the paper prints "-"
    * (VHDL and native standards declare no reusable types).
    */
  final case class Row(name: String, typeDecl: Option[Int], interface: Int)

  /** The published numbers (paper Table 1), for side-by-side comparison. */
  val paper: Vector[Row] = Vector(
    Row("AXI4 equiv. (TIL)",         Some(48), 5),
    Row("AXI4 equiv. (TIL, Group)",  Some(59), 1),
    Row("AXI4 equiv. (VHDL)",        None,     28),
    Row("AXI4",                      None,     44),
    Row("AXI4-Stream equiv. (TIL)",  Some(15), 1),
    Row("AXI4-Stream equiv. (VHDL)", None,     8),
    Row("AXI4-Stream",               None,     9),
  )

  /** Emitted-VHDL signal-line count for the named streamlet of a TIL source. */
  private def vhdlSignals(til: String, streamlet: String): Int = {
    val parsed  = Parser.parse(til)
    val queries = Queries.forProject(parsed.project)
    val errs    = queries.validationErrors
    require(errs.isEmpty, s"TIL sample does not validate: ${errs.mkString("; ")}")
    val backend = new VhdlBackend("repro", queries)
    val (ns, sl) = queries.allStreamlets.collectFirst {
      case (n, s) if s.name == streamlet => (n, s)
    }.getOrElse(throw new NoSuchElementException(s"no streamlet '$streamlet'"))
    backend.signalLineCount(sl.interface)
  }

  /** Measure every row with the toolchain built here. */
  def measured: Vector[Row] = Vector(
    Row("AXI4 equiv. (TIL)",
      Some(Loc.typeDeclLines(TilSamples.axi4)),
      Loc.interfacePortLines(TilSamples.axi4)),
    Row("AXI4 equiv. (TIL, Group)",
      Some(Loc.typeDeclLines(TilSamples.axi4Group)),
      Loc.interfacePortLines(TilSamples.axi4Group)),
    Row("AXI4 equiv. (VHDL)",
      None,
      vhdlSignals(TilSamples.axi4, "manager")),
    Row("AXI4",
      None,
      NativeStandards.axi4Signals.size),
    Row("AXI4-Stream equiv. (TIL)",
      Some(Loc.typeDeclLines(TilSamples.axi4Stream)),
      Loc.interfacePortLines(TilSamples.axi4Stream)),
    Row("AXI4-Stream equiv. (VHDL)",
      None,
      vhdlSignals(TilSamples.axi4Stream, "example")),
    Row("AXI4-Stream",
      None,
      NativeStandards.axi4StreamSignals.size),
  )

  /** Render paper-vs-measured side by side (the bench harness prints this). */
  def render: String = {
    val header =
      f"${"" }%-26s | ${"Type Decl."}%-17s | ${"Interface"}%-17s%n" +
      f"${"" }%-26s | ${"paper"}%-8s ${"ours"}%-8s | ${"paper"}%-8s ${"ours"}%-8s%n" +
      "-" * 70 + "\n"
    val rows = paper.zip(measured).map { case (p, m) =>
      def opt(o: Option[Int]) = o.map(v => s"$v*").getOrElse("-")
      f"${p.name}%-26s | ${opt(p.typeDecl)}%-8s ${opt(m.typeDecl)}%-8s | ${p.interface}%-8d ${m.interface}%-8d"
    }
    header + rows.mkString("\n") +
      "\n(* type declarations are only required once and are reused by every port)"
  }
}
