package repro.tydi.backend.vhdl

import java.nio.file.{Files, Path, Paths}
import repro.tydi.ir._
import repro.tydi.physical.{PhysicalStream, Signal}
import repro.tydi.query.Queries

/** The prototype VHDL backend (paper §7.3). Emission is intentionally simple:
  *
  *  1. the "all streamlets" query retrieves every Streamlet declaration;
  *  2. each Streamlet's Streams are split into physical streams whose signals
  *     become component ports; all components go into a single VHDL package
  *     (namespaces are folded into the component name rather than into
  *     separate packages);
  *  3. each Streamlet gets an architecture: empty when it has no
  *     implementation; imported from (or generated as an empty template at)
  *     the linked directory for a linked implementation; generated with port
  *     maps and connecting signals for a structural implementation.
  *
  * Documentation from the IR is converted into `--` comments (Listing 2).
  */
final class VhdlBackend(projectName: String, queries: Queries) {

  import VhdlBackend._

  def this(projectName: String, project: Project) =
    this(projectName, Queries.forProject(project))

  private def project: Project = queries.project

  /** Unique component name: project, namespace path and streamlet name
    * joined with double underscores, `_com` suffix (Listing 2).
    */
  def componentName(ns: Namespace, sl: Streamlet): String =
    (projectName +: ns.path :+ sl.name).mkString("__") + "_com"

  /** Physical streams of one port, via the (memoized) query system. */
  def physicalStreams(p: Port): Vector[PhysicalStream] = queries.physicalStreams(p.tpe)

  /** The VHDL port lines of one Tydi port: one line per signal of each of its
    * physical streams, with port documentation as preceding comments.
    */
  def portLines(iface: Interface, p: Port): Vector[String] = {
    val docLines = p.doc.toVector.flatMap(commentLines)
    val sigLines = for {
      ps  <- physicalStreams(p)
      sig <- queries.signals(ps)
    } yield {
      val base = (p.name +: ps.path).mkString("_")
      // Signal direction: downstream signals follow the port direction,
      // `ready` flows upstream; a reversed physical stream flips both.
      val flowsIn = (p.direction == In) ^ ps.reversed ^ !sig.downstream
      val dir     = if (flowsIn) "in" else "out"
      s"${base}_${sig.suffix} : $dir ${vhdlType(sig.width)}"
    }
    docLines ++ sigLines
  }

  /** Clock/reset port lines, one pair per effective domain: the default
    * domain emits plain `clk`/`rst` (paper §4.2.1).
    */
  def clockResetLines(iface: Interface): Vector[String] =
    iface.effectiveDomains.flatMap { d =>
      val prefix = if (d == Interface.DefaultDomain) "" else s"${d}_"
      Vector(s"${prefix}clk : in std_logic", s"${prefix}rst : in std_logic")
    }

  /** All port lines (clock/reset + Tydi signals) of a streamlet interface. */
  def allPortLines(iface: Interface): Vector[String] =
    clockResetLines(iface) ++ iface.ports.flatMap(portLines(iface, _))

  /** Number of signal lines (excluding clock/reset and comments) the
    * interface lowers to — the "Interface" column of Table 1 for VHDL.
    */
  def signalLineCount(iface: Interface): Int =
    iface.ports.map(p => physicalStreams(p).map(queries.signals(_).size).sum).sum

  /** The component declaration for a streamlet (Listing 2). */
  def component(ns: Namespace, sl: Streamlet): String = {
    val b = new StringBuilder
    sl.doc.toVector.flatMap(commentLines).foreach(l => b ++= l += '\n')
    b ++= s"component ${componentName(ns, sl)}\n"
    b ++= "  port (\n"
    val lines = allPortLines(sl.interface)
    // Comment lines carry no trailing semicolon; the last signal line omits it.
    val sigIdx = lines.zipWithIndex.filterNot(_._1.startsWith("--")).map(_._2)
    val last   = if (sigIdx.isEmpty) -1 else sigIdx.max
    lines.zipWithIndex.foreach { case (l, idx) =>
      if (l.startsWith("--")) b ++= s"    $l\n"
      else b ++= s"    $l${if (idx == last) "" else ";"}\n"
    }
    b ++= "  );\nend component;"
    b.result()
  }

  /** The single VHDL package holding every component (paper §7.3 step 2). */
  def packageText: String = {
    val comps = project.allStreamlets.map { case (ns, sl) => component(ns, sl) }
    val b     = new StringBuilder
    b ++= "library ieee;\nuse ieee.std_logic_1164.all;\n\n"
    b ++= s"package ${projectName}_pkg is\n\n"
    comps.foreach { c => b ++= c.linesIterator.map("  " + _).mkString("", "\n", "\n\n") }
    b ++= s"end package ${projectName}_pkg;\n"
    b.result()
  }

  private def entityText(ns: Namespace, sl: Streamlet): String = {
    val name  = componentName(ns, sl)
    val b     = new StringBuilder
    b ++= "library ieee;\nuse ieee.std_logic_1164.all;\n\n"
    sl.doc.toVector.flatMap(commentLines).foreach(l => b ++= l += '\n')
    b ++= s"entity $name is\n  port (\n"
    val lines = allPortLines(sl.interface)
    val sigIdx = lines.zipWithIndex.filterNot(_._1.startsWith("--")).map(_._2)
    val last   = if (sigIdx.isEmpty) -1 else sigIdx.max
    lines.zipWithIndex.foreach { case (l, idx) =>
      if (l.startsWith("--")) b ++= s"    $l\n"
      else b ++= s"    $l${if (idx == last) "" else ";"}\n"
    }
    b ++= s"  );\nend entity $name;\n"
    b.result()
  }

  /** Emit the whole project: the package plus one file per streamlet with
    * entity + architecture. `linkRoot` resolves linked-implementation paths;
    * when a linked `.vhd` exists it is imported, otherwise an empty template
    * architecture is generated at the linked location (paper §7.3 step 3b).
    */
  def emit(linkRoot: Option[Path] = None): Map[String, String] = {
    val files = Map.newBuilder[String, String]
    files += s"${projectName}_pkg.vhd" -> packageText
    for ((ns, sl) <- project.allStreamlets) {
      val name = componentName(ns, sl)
      val arch = architecture(ns, sl, linkRoot)
      files += s"$name.vhd" -> (entityText(ns, sl) + "\n" + arch)
    }
    files.result()
  }

  /** The architecture body for a streamlet (paper §7.3 step 3). */
  def architecture(ns: Namespace, sl: Streamlet, linkRoot: Option[Path]): String =
    sl.impl.flatMap(project.concreteImpl(ns, _)) match {
      case None =>
        emptyArchitecture(componentName(ns, sl))
      case Some(LinkedImpl(path, doc)) =>
        linkedArchitecture(ns, sl, path, doc, linkRoot)
      case Some(s: StructuralImpl) =>
        structuralArchitecture(ns, sl, s)
      case Some(_: ImplRef) =>
        emptyArchitecture(componentName(ns, sl)) // unreachable after concreteImpl
    }

  private def emptyArchitecture(name: String): String =
    s"architecture Behavioral of $name is\nbegin\nend architecture Behavioral;\n"

  /** Linked implementation: look for `<component>.vhd` in the linked
    * directory; import it when present, otherwise generate an empty template
    * there (when a link root is provided) and return the template.
    */
  private def linkedArchitecture(
      ns: Namespace, sl: Streamlet, path: String,
      doc: Option[String], linkRoot: Option[Path]): String = {
    val name = componentName(ns, sl)
    val docText = doc.toVector.flatMap(commentLines).map(_ + "\n").mkString
    linkRoot match {
      case Some(root) =>
        val dir  = root.resolve(Paths.get(path)).normalize()
        val file = dir.resolve(s"$name.vhd")
        if (Files.exists(file)) docText + new String(Files.readAllBytes(file), "UTF-8")
        else {
          Files.createDirectories(dir)
          val template = emptyArchitecture(name)
          Files.write(file, template.getBytes("UTF-8"))
          docText + template
        }
      case None => docText + emptyArchitecture(name)
    }
  }

  /** Structural implementation: port mappings represent Streamlet instances
    * and signals connect ports between instances and the enclosing Streamlet
    * (paper §7.3 step 3c). Validation guarantees every port appears in
    * exactly one connection.
    */
  private def structuralArchitecture(ns: Namespace, sl: Streamlet, impl: StructuralImpl): String = {
    val name = componentName(ns, sl)
    val resolved: Map[String, (Namespace, Streamlet)] =
      impl.instances.map(i => i.name -> project.resolveStreamlet(ns, i.streamlet).get).toMap

    // Net assignment: each connection gets a net; connections touching a
    // parent port reuse the entity's port signals directly.
    final case class Net(prefix: String, port: Port, declare: Boolean)
    val nets: Map[Endpoint, Net] = impl.connections.zipWithIndex.flatMap {
      case (Connection(a, b), idx) =>
        def portOf(e: Endpoint): Port = e match {
          case ParentPort(p)       => sl.interface.port(p).get
          case InstancePort(i, p)  => resolved(i)._2.interface.port(p).get
        }
        val parentEnd = Vector(a, b).collectFirst { case pp: ParentPort => pp }
        val net = parentEnd match {
          case Some(pp) => Net(pp.port, portOf(pp), declare = false)
          case None     => Net(s"s${idx}_${a.show.replace('.', '_')}", portOf(a), declare = true)
        }
        Vector(a -> net, b -> net)
    }.toMap

    val b = new StringBuilder
    impl.doc.toVector.flatMap(commentLines).foreach(l => b ++= l += '\n')
    b ++= s"architecture Structural of $name is\n"
    // Declared nets: one VHDL signal per physical-stream signal.
    val declared = nets.values.filter(_.declare).map(n => (n.prefix, n.port)).toVector
      .distinctBy(_._1).sortBy(_._1)
    for ((prefix, port) <- declared; ps <- physicalStreams(port); sig <- queries.signals(ps)) {
      val base = (prefix +: ps.path).mkString("_")
      b ++= s"  signal ${base}_${sig.suffix} : ${vhdlType(sig.width)};\n"
    }
    b ++= "begin\n"
    for (inst <- impl.instances) {
      val (instNs, target) = resolved(inst.name)
      b ++= s"  ${inst.name}: ${componentName(instNs, target)} port map (\n"
      val maps = Vector.newBuilder[String]
      for (d <- target.interface.effectiveDomains) {
        val parentDom  = inst.domainMap.getOrElse(d, d)
        val instPrefix = if (d == Interface.DefaultDomain) "" else s"${d}_"
        val parPrefix  = if (parentDom == Interface.DefaultDomain) "" else s"${parentDom}_"
        maps += s"${instPrefix}clk => ${parPrefix}clk"
        maps += s"${instPrefix}rst => ${parPrefix}rst"
      }
      for (port <- target.interface.ports) {
        val ep  = InstancePort(inst.name, port.name)
        val net = nets(ep)
        for (ps <- physicalStreams(port); sig <- queries.signals(ps)) {
          val formal = ((port.name +: ps.path).mkString("_")) + s"_${sig.suffix}"
          val actual = ((net.prefix +: ps.path).mkString("_")) + s"_${sig.suffix}"
          maps += s"$formal => $actual"
        }
      }
      b ++= maps.result().map("    " + _).mkString(",\n")
      b ++= "\n  );\n"
    }
    // Pass-through connections between two parent ports become signal
    // assignments, driven from whichever side acts as the source.
    for (Connection(a: ParentPort, c: ParentPort) <- impl.connections) {
      val pa = sl.interface.port(a.port).get
      val pc = sl.interface.port(c.port).get
      for (ps <- physicalStreams(pa); sig <- queries.signals(ps)) {
        // The parent `in` port sources downstream signals inside the body.
        val aDrives = (pa.direction == In) ^ ps.reversed ^ !sig.downstream
        val (src, dst) = if (aDrives) (pa, pc) else (pc, pa)
        val s = ((src.name +: ps.path).mkString("_")) + s"_${sig.suffix}"
        val d = ((dst.name +: ps.path).mkString("_")) + s"_${sig.suffix}"
        b ++= s"  $d <= $s;\n"
      }
    }
    b ++= s"end architecture Structural;\n"
    b.result()
  }
}

object VhdlBackend {

  /** Render a signal width as a VHDL type (Listing 2/4). */
  def vhdlType(width: Int): String =
    if (width == 1) "std_logic" else s"std_logic_vector(${width - 1} downto 0)"

  /** Documentation becomes `--` comments in the output (Listing 2). */
  def commentLines(doc: String): Vector[String] =
    doc.linesIterator.map(l => s"-- ${l.trim}".stripSuffix(" ")).toVector
}
