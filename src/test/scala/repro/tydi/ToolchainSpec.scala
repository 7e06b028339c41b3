package repro.tydi

import repro.SparkSpec
import repro.tydi.backend.vhdl.VhdlBackend
import repro.tydi.query.Queries
import repro.tydi.til.Parser

/** End-to-end toolchain integration (paper §7, Figure 2): TIL source ->
  * parser -> query system -> validation -> VHDL emission, plus the query
  * system's incremental behavior across edits of a multi-namespace project.
  */
class ToolchainSpec extends SparkSpec {

  private val libTil =
    """namespace lib {
      |type word = Stream (
      |    data: Bits(32),
      |    complexity: 2,
      |);
      |#doubles each element#
      |streamlet double = (i: in word, o: out word) { "vhdl/double" };
      |}
      |""".stripMargin

  private val appTil =
    """namespace app {
      |type word = Stream (
      |    data: Bits(32),
      |    complexity: 2,
      |);
      |streamlet quad = (src: in word, dst: out word) {
      |    d1 = lib::double;
      |    d2 = lib::double;
      |    src -- d1.i;
      |    d1.o -- d2.i;
      |    d2.o -- dst;
      |};
      |}
      |""".stripMargin

  test("a multi-file project parses, validates and emits VHDL end to end") {
    val parsed  = Parser.parseAll(Vector(libTil, appTil))
    val queries = Queries.forProject(parsed.project)
    assert(queries.validationErrors.isEmpty)
    val backend = new VhdlBackend("proj", queries)
    val files   = backend.emit(None)
    assert(files.keySet == Set(
      "proj_pkg.vhd", "proj__lib__double_com.vhd", "proj__app__quad_com.vhd"))
    val quad = files("proj__app__quad_com.vhd")
    assert(quad.contains("architecture Structural of proj__app__quad_com"))
    assert(quad.contains("d1: proj__lib__double_com port map ("))
    val pkg = files("proj_pkg.vhd")
    assert(pkg.contains("-- doubles each element"))
  }

  test("editing one namespace leaves the other namespace's queries cached") {
    val parsed  = Parser.parseAll(Vector(libTil, appTil))
    val queries = Queries.forProject(parsed.project)
    queries.allStreamlets // warm
    val n1 = queries.db.evaluations("allStreamlets")

    // Edit only the app namespace (new port name); lib is untouched.
    val edited = Parser.parseAll(Vector(libTil,
      appTil.replace("src: in word", "input: in word").replace("src --", "input --")))
    edited.project.namespaces.foreach(queries.setNamespace)
    queries.allStreamlets
    assert(queries.db.evaluations("allStreamlets") == n1 + 1) // project changed
    // Re-setting identical namespaces afterwards costs nothing.
    edited.project.namespaces.foreach(queries.setNamespace)
    queries.allStreamlets
    assert(queries.db.evaluations("allStreamlets") == n1 + 1)
  }

  test("type-level queries are shared across namespaces with identical structure") {
    // lib::word and app::word are structurally identical; the split query
    // runs once because identifiers are erased (paper §4.2.2).
    val parsed  = Parser.parseAll(Vector(libTil, appTil))
    val queries = Queries.forProject(parsed.project)
    for ((_, sl) <- queries.allStreamlets; p <- sl.interface.ports)
      queries.physicalStreams(p.tpe)
    assert(queries.db.evaluations("physicalStreams") == 1)
  }

  test("an invalid edit surfaces through the validation query and emission still works for valid parts") {
    val parsed  = Parser.parseAll(Vector(libTil, appTil))
    val queries = Queries.forProject(parsed.project)
    assert(queries.validationErrors.isEmpty)
    val broken = appTil.replace("d2.o -- dst;", "")
    val editedProject = Parser.parseAll(Vector(libTil, broken)).project
    editedProject.namespaces.foreach(queries.setNamespace)
    val errs = queries.validationErrors
    assert(errs.exists(_.message.contains("unconnected")))
  }

  test("Figure 2 workflow: the linked implementation round-trips through the backend") {
    val parsed  = Parser.parseAll(Vector(libTil, appTil))
    val backend = new VhdlBackend("proj", parsed.project)
    val root = java.nio.file.Files.createTempDirectory("toolchain-")
    // First emission generates a template for the linked impl...
    backend.emit(Some(root))
    val linked = root.resolve("vhdl/double").resolve("proj__lib__double_com.vhd")
    assert(java.nio.file.Files.exists(linked))
    // ...the designer fills in behavior in the target language...
    val custom = "architecture Fast of proj__lib__double_com is\nbegin\nend architecture Fast;\n"
    java.nio.file.Files.write(linked, custom.getBytes("UTF-8"))
    // ...and the next emission imports it.
    val files = backend.emit(Some(root))
    assert(files("proj__lib__double_com.vhd").contains("architecture Fast"))
  }
}
