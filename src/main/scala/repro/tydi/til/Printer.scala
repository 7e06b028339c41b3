package repro.tydi.til

import repro.tydi.ir._
import repro.tydi.types._

/** Pretty-printer: emit a Project back to TIL text. Because type identifiers
  * are erased when the IR is constructed (paper §4.2.2), types print
  * structurally. Round-tripping print -> parse yields an equal Project,
  * which the test suite asserts.
  */
object Printer {

  def print(project: Project): String =
    project.namespaces.map(printNamespace).mkString("\n")

  def printNamespace(ns: Namespace): String = {
    val b = new StringBuilder
    b ++= s"namespace ${ns.path.mkString("::")} {\n"
    for ((name, i) <- ns.interfaces.toVector.sortBy(_._1)) {
      doc(b, i.doc, "  ")
      b ++= s"  interface $name = ${printInterface(i)};\n"
    }
    for ((name, impl) <- ns.impls.toVector.sortBy(_._1)) {
      doc(b, impl.doc, "  ")
      b ++= s"  impl $name = ${printImpl(impl)};\n"
    }
    for ((name, sl) <- ns.streamlets.toVector.sortBy(_._1)) {
      doc(b, sl.doc, "  ")
      b ++= s"  streamlet $name = ${printInterface(sl.interface)}"
      // A structural impl's printed form already carries its braces.
      sl.impl.foreach {
        case s: StructuralImpl => b ++= s" ${printImpl(s)}"
        case other             => b ++= s" { ${printImpl(other)} }"
      }
      b ++= ";\n"
    }
    b ++= "}\n"
    b.result()
  }

  private def doc(b: StringBuilder, d: Option[String], indent: String): Unit =
    d.foreach(text => b ++= s"$indent#$text#\n")

  def printInterface(i: Interface): String = {
    val doms =
      if (i.domains.isEmpty) ""
      else i.domains.map("'" + _).mkString("<", ", ", ">")
    val ports = i.ports.map { p =>
      val d    = p.doc.map(t => s"#$t# ").getOrElse("")
      val dom  = p.domain.map(" '" + _).getOrElse("")
      s"$d${p.name}: ${p.direction.name} ${printType(p.tpe)}$dom"
    }
    s"$doms(${ports.mkString(", ")})"
  }

  def printImpl(impl: Implementation): String = impl match {
    case LinkedImpl(path, _) => s""""$path""""
    case ImplRef(ref, _)     => ref.toString
    case StructuralImpl(instances, connections, _) =>
      val insts = instances.map { inst =>
        val doms =
          if (inst.domainMap.isEmpty) ""
          else inst.domainMap.toVector
            .map { case (a, b) => if (a == b) s"'$a" else s"'$a = '$b" }
            .mkString("<", ", ", ">")
        s"${inst.name} = ${inst.streamlet}$doms;"
      }
      val conns = connections.map(c => s"${c.show};")
      s"{ ${(insts ++ conns).mkString(" ")} }"
  }

  def printType(t: LogicalType): String = t match {
    case TNull      => "Null"
    case TBits(n)   => s"Bits($n)"
    case TGroup(fs) => fs.map(f => s"${f.name}: ${printType(f.tpe)}").mkString("Group(", ", ", ")")
    case TUnion(fs) => fs.map(f => s"${f.name}: ${printType(f.tpe)}").mkString("Union(", ", ", ")")
    case s: TStream =>
      val props = Vector.newBuilder[String]
      props += s"data: ${printType(s.data)}"
      if (!s.throughput.isOne) props += s"throughput: ${s.throughput}"
      if (s.dimensionality != 0) props += s"dimensionality: ${s.dimensionality}"
      if (s.synchronicity != Sync) props += s"synchronicity: ${s.synchronicity.name}"
      if (s.complexity != 1) props += s"complexity: ${s.complexity}"
      if (s.direction != Forward) props += s"direction: ${s.direction.name}"
      s.user.foreach(u => props += s"user: ${printType(u)}")
      if (s.keep) props += "keep: true"
      s"Stream(${props.result().mkString(", ")})"
  }
}
