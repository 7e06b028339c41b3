package repro.tydi.backend.vhdl

import java.nio.file.Files
import repro.SparkSpec
import repro.tydi.eval.TilSamples
import repro.tydi.ir._
import repro.tydi.til.Parser
import repro.tydi.types._

class VhdlBackendSpec extends SparkSpec {

  private def backendFor(til: String, project: String = "my") = {
    val parsed = Parser.parse(til)
    (new VhdlBackend(project, parsed.project), parsed.project)
  }

  // ---- Listing 2: the documentation example ----

  test("Listing 2: component name folds project, namespace path and streamlet name") {
    val (b, p) = backendFor(TilSamples.paperExample)
    val (ns, sl) = p.allStreamlets.head
    assert(b.componentName(ns, sl) == "my__my__example__space__comp1_com")
  }

  test("Listing 2: the component carries clk/rst plus valid/ready/data per port") {
    val (b, p) = backendFor(TilSamples.paperExample)
    val (ns, sl) = p.allStreamlets.head
    val comp = b.component(ns, sl)
    assert(comp.contains("clk : in std_logic"))
    assert(comp.contains("rst : in std_logic"))
    assert(comp.contains("a_valid : in std_logic"))
    assert(comp.contains("a_ready : out std_logic"))
    assert(comp.contains("a_data : in std_logic_vector(53 downto 0)"))
    assert(comp.contains("b_valid : out std_logic"))
    assert(comp.contains("b_ready : in std_logic"))
    assert(comp.contains("b_data : out std_logic_vector(53 downto 0)"))
    assert(comp.contains("d_data : out std_logic_vector(53 downto 0)"))
  }

  test("Listing 2: documentation becomes comments on the component and its ports") {
    val (b, p) = backendFor(TilSamples.paperExample)
    val (ns, sl) = p.allStreamlets.head
    val comp = b.component(ns, sl)
    assert(comp.contains("-- documentation (optional)"))
    assert(comp.contains("-- this is port"))
    assert(comp.contains("-- documentation"))
    // Comments precede their subject.
    val lines = comp.linesIterator.toVector
    val docIdx = lines.indexWhere(_.contains("-- this is port"))
    assert(lines(docIdx + 2).contains("c_valid"))
  }

  test("comments in TIL do NOT reach the VHDL — only documentation does (§7.2)") {
    val (b, p) = backendFor(TilSamples.paperExample)
    val (ns, sl) = p.allStreamlets.head
    assert(!b.component(ns, sl).contains("This is a comment"))
  }

  // ---- Listing 4: AXI4-Stream signals ----

  test("Listing 4: the AXI4-Stream port emits exactly the paper's 8 signal lines") {
    val (b, p) = backendFor(TilSamples.axi4Stream, project = "repro")
    val (ns, sl) = p.allStreamlets.head
    val port  = sl.interface.ports.head
    val lines = b.portLines(sl.interface, port)
    assert(lines == Vector(
      "axi4stream_valid : in std_logic",
      "axi4stream_ready : out std_logic",
      "axi4stream_data : in std_logic_vector(1151 downto 0)",
      "axi4stream_last : in std_logic",
      "axi4stream_stai : in std_logic_vector(6 downto 0)",
      "axi4stream_endi : in std_logic_vector(6 downto 0)",
      "axi4stream_strb : in std_logic_vector(127 downto 0)",
      "axi4stream_user : in std_logic_vector(12 downto 0)"))
  }

  test("out-direction ports flip every signal except ready") {
    val til = """namespace t {
      |type s = Stream(data: Bits(4));
      |streamlet c = (p: out s);
      |}""".stripMargin
    val (b, p) = backendFor(til)
    val (ns, sl) = p.allStreamlets.head
    assert(b.portLines(sl.interface, sl.interface.ports.head) == Vector(
      "p_valid : out std_logic",
      "p_ready : in std_logic",
      "p_data : out std_logic_vector(3 downto 0)"))
  }

  test("a Reversed child stream flows against the port direction in VHDL") {
    val til = """namespace t {
      |type req = Stream(data: Bits(8), complexity: 2);
      |type rsp = Stream(data: Bits(8), complexity: 2, direction: Reverse);
      |type mem = Stream(data: Group(addr: req, rdata: rsp));
      |streamlet c = (m: in mem);
      |}""".stripMargin
    val (b, p) = backendFor(til)
    val (ns, sl) = p.allStreamlets.head
    val lines = b.portLines(sl.interface, sl.interface.ports.head)
    assert(lines.contains("m_addr_valid : in std_logic"))
    assert(lines.contains("m_addr_ready : out std_logic"))
    assert(lines.contains("m_rdata_valid : out std_logic"))
    assert(lines.contains("m_rdata_ready : in std_logic"))
    assert(lines.contains("m_rdata_data : out std_logic_vector(7 downto 0)"))
  }

  test("named clock domains emit their own clk/rst pairs (§4.2.1)") {
    val til = """namespace t {
      |type s = Stream(data: Bits(1));
      |streamlet c = <'fast, 'slow>(a: in s 'fast, b: out s 'slow);
      |}""".stripMargin
    val (b, p) = backendFor(til)
    val (ns, sl) = p.allStreamlets.head
    val lines = b.clockResetLines(sl.interface)
    assert(lines == Vector(
      "fast_clk : in std_logic", "fast_rst : in std_logic",
      "slow_clk : in std_logic", "slow_rst : in std_logic"))
  }

  // ---- architectures (§7.3 step 3) ----

  test("a streamlet without implementation gets an empty architecture") {
    val til = """namespace t {
      |type s = Stream(data: Bits(1));
      |streamlet c = (p: in s);
      |}""".stripMargin
    val (b, p) = backendFor(til)
    val (ns, sl) = p.allStreamlets.head
    val arch = b.architecture(ns, sl, None)
    assert(arch.contains("architecture Behavioral"))
    assert(arch.contains("begin\nend architecture"))
  }

  test("a linked implementation generates an empty template at the linked location") {
    val til = """namespace t {
      |type s = Stream(data: Bits(1));
      |streamlet c = (p: in s) { "leafdir" };
      |}""".stripMargin
    val (b, p) = backendFor(til)
    val (ns, sl) = p.allStreamlets.head
    val root = Files.createTempDirectory("vhdl-link-")
    val arch = b.architecture(ns, sl, Some(root))
    val expected = root.resolve("leafdir").resolve("my__t__c_com.vhd")
    assert(Files.exists(expected))
    assert(arch.contains("architecture Behavioral of my__t__c_com"))
  }

  test("a linked implementation imports an existing .vhd file (§7.3 step 3b)") {
    val til = """namespace t {
      |type s = Stream(data: Bits(1));
      |streamlet c = (p: in s) { "leafdir" };
      |}""".stripMargin
    val (b, p) = backendFor(til)
    val (ns, sl) = p.allStreamlets.head
    val root = Files.createTempDirectory("vhdl-link-")
    val dir  = Files.createDirectories(root.resolve("leafdir"))
    val custom = "architecture Custom of my__t__c_com is\nbegin\nend architecture Custom;\n"
    Files.write(dir.resolve("my__t__c_com.vhd"), custom.getBytes("UTF-8"))
    val arch = b.architecture(ns, sl, Some(root))
    assert(arch.contains("architecture Custom"))
  }

  test("a structural implementation emits port maps and connecting signals (§7.3 step 3c)") {
    val til = """namespace t {
      |type s = Stream(data: Bits(8));
      |streamlet leaf = (x: in s, y: out s);
      |streamlet top = (a: in s, b: out s) {
      |  i1 = leaf;
      |  i2 = leaf;
      |  a -- i1.x;
      |  i1.y -- i2.x;
      |  i2.y -- b;
      |};
      |}""".stripMargin
    val (b, p) = backendFor(til)
    val (ns, sl) = p.allStreamlets.find(_._2.name == "top").get
    val arch = b.architecture(ns, sl, None)
    assert(arch.contains("architecture Structural of my__t__top_com"))
    assert(arch.contains("i1: my__t__leaf_com port map ("))
    assert(arch.contains("i2: my__t__leaf_com port map ("))
    // Parent-port connections map directly onto entity ports.
    assert(arch.contains("x_valid => a_valid"))
    assert(arch.contains("y_valid => b_valid"))
    // The i1 -> i2 connection goes through a declared signal.
    assert(arch.linesIterator.exists(l => l.trim.startsWith("signal s1_i1_y_valid")))
    assert(arch.contains("clk => clk"))
    assert(arch.contains("rst => rst"))
  }

  test("a parent-to-parent pass-through becomes signal assignments") {
    val s = TStream(TBits(4))
    val pass = Streamlet("wire",
      Interface.of(Port("a", In, s), Port("b", Out, s)),
      Some(StructuralImpl(Vector.empty,
        Vector(Connection(ParentPort("a"), ParentPort("b"))))))
    val prj = Project.of(Namespace(Vector("t"), streamlets = Map("wire" -> pass)))
    val b = new VhdlBackend("my", prj)
    val arch = b.architecture(prj.namespaces.head, pass, None)
    assert(arch.contains("b_valid <= a_valid;"))
    assert(arch.contains("b_data <= a_data;"))
    assert(arch.contains("a_ready <= b_ready;")) // ready flows upstream
  }

  // ---- package emission (§7.3 step 2) ----

  test("all streamlets land in a single VHDL package regardless of namespace") {
    val (b, _) = backendFor(
      """namespace a { type s = Stream(data: Bits(1)); streamlet c1 = (p: in s); }
        |namespace b { type s = Stream(data: Bits(1)); streamlet c2 = (p: in s); }
        |""".stripMargin)
    val pkg = b.packageText
    assert(pkg.contains("package my_pkg is"))
    assert(pkg.contains("component my__a__c1_com"))
    assert(pkg.contains("component my__b__c2_com"))
    assert(pkg.linesIterator.count(_.contains("package")) == 2) // is + end
  }

  test("emit produces the package plus one entity/architecture file per streamlet") {
    val (b, _) = backendFor(TilSamples.axi4Stream, project = "repro")
    val files = b.emit(None)
    assert(files.keySet == Set("repro_pkg.vhd", "repro__repro__axi__example_com.vhd"))
    val entity = files("repro__repro__axi__example_com.vhd")
    assert(entity.contains("entity repro__repro__axi__example_com is"))
    assert(entity.contains("architecture Behavioral"))
  }

  test("vhdlType renders std_logic for 1 bit and vectors otherwise") {
    assert(VhdlBackend.vhdlType(1) == "std_logic")
    assert(VhdlBackend.vhdlType(54) == "std_logic_vector(53 downto 0)")
  }
}
