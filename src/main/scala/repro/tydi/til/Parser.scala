package repro.tydi.til

import scala.collection.mutable
import repro.tydi.ir._
import repro.tydi.spec._
import repro.tydi.types._

/** Result of parsing one or more TIL sources: the IR Project plus any test
  * declarations (tests specify behavior, §6, and are kept out of the
  * Project so they never appear in a backend's "proper" output, §6.2).
  */
final case class TilFile(project: Project, tests: Vector[TestDecl])

final case class ParseError(message: String, pos: Pos)
    extends RuntimeException(s"$pos: $message")

/** Hand-written recursive-descent parser for TIL (paper §7.2). Supports:
  * namespaces with `::` paths, `type`/`interface`/`impl`/`streamlet`
  * declarations, documentation (`#..#`) on declarations and ports, clock
  * domains (`<'dom1, 'dom2>` on interfaces, `'dom` on ports, domain
  * assignment on instances), linked (`"./path"`) and structural
  * implementations, subsetting Streamlets into Interfaces by reference, and
  * the proposed testing grammar of §6 (`test` declarations with parallel
  * port assertions and staged `sequence`s).
  *
  * Type identifiers are resolved and erased at parse time: only the
  * structural properties defined by the Tydi specification are stored in the
  * IR (paper §4.2.2).
  */
object Parser {

  def parse(src: String): TilFile = parseAll(Vector(src))

  /** Parse several TIL sources into one project (later sources may reference
    * namespaces declared in earlier ones by qualified name).
    */
  def parseAll(sources: Vector[String]): TilFile = {
    val env = new Env
    sources.foreach(s => new P(Lexer.tokenize(s), env).parseFile())
    env.result()
  }

  private final class NsBuilder(val path: Vector[String]) {
    val types       = mutable.LinkedHashMap.empty[String, LogicalType]
    val interfaces  = mutable.LinkedHashMap.empty[String, Interface]
    val streamlets  = mutable.LinkedHashMap.empty[String, Streamlet]
    val impls       = mutable.LinkedHashMap.empty[String, Implementation]
    def build: Namespace =
      Namespace(path, types.toMap, interfaces.toMap, streamlets.toMap, impls.toMap)
  }

  private final class Env {
    val namespaces = mutable.LinkedHashMap.empty[Vector[String], NsBuilder]
    val tests      = Vector.newBuilder[TestDecl]
    def ns(path: Vector[String]): NsBuilder =
      namespaces.getOrElseUpdate(path, new NsBuilder(path))
    def result(): TilFile =
      TilFile(Project(namespaces.values.map(_.build).toVector), tests.result())
  }

  private final class P(tokens: Vector[Token], env: Env) {
    private var i = 0

    private def peek: Token  = tokens(i)
    private def next(): Token = { val t = tokens(i); i += 1; t }
    private def fail(msg: String): Nothing = throw ParseError(msg, peek.pos)

    private def expectPunct(p: String): Unit = next() match {
      case TPunct(`p`, _) => ()
      case t              => throw ParseError(s"expected '$p', got ${show(t)}", t.pos)
    }
    private def expectIdent(): String = next() match {
      case TIdent(n, _) => n
      case t            => throw ParseError(s"expected identifier, got ${show(t)}", t.pos)
    }
    private def expectKeyword(kw: String): Unit = next() match {
      case TIdent(`kw`, _) => ()
      case t               => throw ParseError(s"expected '$kw', got ${show(t)}", t.pos)
    }
    private def expectInt(): Long = next() match {
      case TInt(v, _) => v
      case t          => throw ParseError(s"expected integer, got ${show(t)}", t.pos)
    }
    private def expectString(): String = next() match {
      case TString(s, _) => s
      case t             => throw ParseError(s"expected string, got ${show(t)}", t.pos)
    }
    private def atPunct(p: String): Boolean = peek match {
      case TPunct(`p`, _) => true
      case _              => false
    }
    private def atIdent(name: String): Boolean = peek match {
      case TIdent(`name`, _) => true
      case _                 => false
    }
    private def show(t: Token): String = t match {
      case TIdent(n, _)   => s"identifier '$n'"
      case TInt(v, _)     => s"integer $v"
      case TDecimal(s, _) => s"decimal $s"
      case TString(s, _)  => s"""string "$s""""
      case TDoc(_, _)     => "documentation block"
      case TPunct(p, _)   => s"'$p'"
      case TEof(_)        => "end of input"
    }

    def parseFile(): Unit = {
      while (!peek.isInstanceOf[TEof]) {
        expectKeyword("namespace")
        val path = parsePath()
        val ns   = env.ns(path)
        expectPunct("{")
        while (!atPunct("}")) parseDecl(ns)
        expectPunct("}")
      }
    }

    private def parsePath(): Vector[String] = {
      val parts = Vector.newBuilder[String]
      parts += expectIdent()
      while (atPunct("::")) { next(); parts += expectIdent() }
      parts.result()
    }

    private def parseDoc(): Option[String] = peek match {
      case TDoc(text, _) => next(); Some(text)
      case _             => None
    }

    private def parseDecl(ns: NsBuilder): Unit = {
      val doc = parseDoc()
      peek match {
        case TIdent("type", _)      => next(); parseTypeDecl(ns)
        case TIdent("interface", _) => next(); parseInterfaceDecl(ns, doc)
        case TIdent("impl", _)      => next(); parseImplDecl(ns, doc)
        case TIdent("streamlet", _) => next(); parseStreamletDecl(ns, doc)
        case TIdent("test", _)      => next(); parseTestDecl(ns, doc)
        case t => throw ParseError(
          s"expected declaration (type/interface/impl/streamlet/test), got ${show(t)}", t.pos)
      }
    }

    // ---- types ----

    private def parseTypeDecl(ns: NsBuilder): Unit = {
      val name = expectIdent()
      expectPunct("=")
      val tpe = parseTypeExpr(ns)
      expectPunct(";")
      if (ns.types.contains(name)) fail(s"duplicate type declaration '$name'")
      ns.types(name) = tpe
    }

    private def parseTypeExpr(ns: NsBuilder): LogicalType = peek match {
      case TIdent("Null", _)   => next(); TNull
      case TIdent("Bits", _)   =>
        next(); expectPunct("(")
        val n = expectInt()
        expectPunct(")")
        TBits(n.toInt)
      case TIdent("Group", _)  => next(); TGroup(parseFields(ns))
      case TIdent("Union", _)  => next(); TUnion(parseFields(ns))
      case TIdent("Stream", _) => next(); parseStreamType(ns)
      case TIdent(_, p)        =>
        val ref = parsePath()
        resolveType(ns, ref).getOrElse(
          throw ParseError(s"unknown type '${ref.mkString("::")}'", p))
      case t => throw ParseError(s"expected type expression, got ${show(t)}", t.pos)
    }

    private def parseFields(ns: NsBuilder): Vector[Field] = {
      expectPunct("(")
      val fields = Vector.newBuilder[Field]
      while (!atPunct(")")) {
        val name = expectIdent()
        expectPunct(":")
        fields += Field(name, parseTypeExpr(ns))
        if (atPunct(",")) next() else if (!atPunct(")")) fail("expected ',' or ')'")
      }
      expectPunct(")")
      fields.result()
    }

    private def parseStreamType(ns: NsBuilder): TStream = {
      expectPunct("(")
      var data: Option[LogicalType]   = None
      var throughput                  = Rational.one
      var dimensionality              = 0
      var synchronicity: Synchronicity = Sync
      var complexity                  = 1
      var direction: StreamDirection  = Forward
      var user: Option[LogicalType]   = None
      var keep                        = false
      while (!atPunct(")")) {
        val keyTok = peek
        val key    = expectIdent()
        expectPunct(":")
        key match {
          case "data"           => data = Some(parseTypeExpr(ns))
          case "throughput"     => throughput = parseRational()
          case "dimensionality" => dimensionality = expectInt().toInt
          case "synchronicity"  =>
            val s = expectIdent()
            synchronicity = Synchronicity.parse(s).getOrElse(
              throw ParseError(s"unknown synchronicity '$s'", keyTok.pos))
          case "complexity"     => complexity = expectInt().toInt
          case "direction"      =>
            val d = expectIdent()
            direction = StreamDirection.parse(d).getOrElse(
              throw ParseError(s"unknown direction '$d'", keyTok.pos))
          case "user"           => user = Some(parseTypeExpr(ns))
          case "keep"           => keep = parseBool()
          case other            =>
            throw ParseError(s"unknown Stream property '$other'", keyTok.pos)
        }
        if (atPunct(",")) next() else if (!atPunct(")")) fail("expected ',' or ')'")
      }
      expectPunct(")")
      val d = data.getOrElse(fail("Stream requires a 'data' property"))
      TStream(d, throughput, dimensionality, synchronicity, complexity, direction, user, keep)
    }

    private def parseRational(): Rational = next() match {
      case TInt(v, _)     => Rational(v)
      case TDecimal(s, _) => Rational.parseDecimal(s)
      case t              => throw ParseError(s"expected number, got ${show(t)}", t.pos)
    }

    private def parseBool(): Boolean = next() match {
      case TIdent("true", _)  => true
      case TIdent("false", _) => false
      case t => throw ParseError(s"expected 'true' or 'false', got ${show(t)}", t.pos)
    }

    private def resolveType(ns: NsBuilder, path: Vector[String]): Option[LogicalType] =
      if (path.size == 1) ns.types.get(path.head)
      else env.namespaces.get(path.init).flatMap(_.types.get(path.last))

    // ---- interfaces ----

    private def parseInterfaceDecl(ns: NsBuilder, doc: Option[String]): Unit = {
      val name = expectIdent()
      expectPunct("=")
      val iface = parseInterfaceExpr(ns).copy(doc = doc)
      expectPunct(";")
      if (ns.interfaces.contains(name)) fail(s"duplicate interface declaration '$name'")
      ns.interfaces(name) = iface
    }

    /** An interface expression: `<'dom,..>? ( ports )`, an interface
      * identifier, or a streamlet identifier (subsetting sugar, paper §7.2).
      */
    private def parseInterfaceExpr(ns: NsBuilder): Interface = peek match {
      case TPunct("<", _) | TPunct("(", _) =>
        val domains =
          if (atPunct("<")) parseDomainList()
          else Vector.empty[String]
        Interface(parsePorts(ns), domains)
      case TIdent(_, p) =>
        val ref = parsePath()
        resolveInterface(ns, ref).getOrElse(
          throw ParseError(s"unknown interface or streamlet '${ref.mkString("::")}'", p))
      case t => throw ParseError(s"expected interface expression, got ${show(t)}", t.pos)
    }

    private def parseDomainList(): Vector[String] = {
      expectPunct("<")
      val doms = Vector.newBuilder[String]
      while (!atPunct(">")) {
        expectPunct("'")
        doms += expectIdent()
        if (atPunct(",")) next() else if (!atPunct(">")) fail("expected ',' or '>'")
      }
      expectPunct(">")
      doms.result()
    }

    private def parsePorts(ns: NsBuilder): Vector[Port] = {
      expectPunct("(")
      val ports = Vector.newBuilder[Port]
      while (!atPunct(")")) {
        val doc  = parseDoc()
        val name = expectIdent()
        expectPunct(":")
        val dirTok = peek
        val dir = expectIdent() match {
          case "in"  => In
          case "out" => Out
          case other => throw ParseError(s"expected 'in' or 'out', got '$other'", dirTok.pos)
        }
        val tpeTok = peek
        val tpe = parseTypeExpr(ns) match {
          case s: TStream => s
          case other      =>
            throw ParseError(s"port '$name' must carry a Stream type, got $other", tpeTok.pos)
        }
        val domain = if (atPunct("'")) { next(); Some(expectIdent()) } else None
        ports += Port(name, dir, tpe, domain, doc)
        if (atPunct(",")) next() else if (!atPunct(")")) fail("expected ',' or ')'")
      }
      expectPunct(")")
      ports.result()
    }

    private def resolveInterface(ns: NsBuilder, path: Vector[String]): Option[Interface] = {
      def from(b: NsBuilder, name: String): Option[Interface] =
        b.interfaces.get(name).orElse(b.streamlets.get(name).map(_.subset))
      if (path.size == 1) from(ns, path.head)
      else env.namespaces.get(path.init).flatMap(from(_, path.last))
    }

    // ---- implementations ----

    private def parseImplDecl(ns: NsBuilder, doc: Option[String]): Unit = {
      val name = expectIdent()
      expectPunct("=")
      val impl = parseImplExpr(ns, doc)
      expectPunct(";")
      if (ns.impls.contains(name)) fail(s"duplicate impl declaration '$name'")
      ns.impls(name) = impl
    }

    private def parseImplExpr(ns: NsBuilder, doc: Option[String]): Implementation =
      peek match {
        case TString(_, _) => LinkedImpl(expectString(), doc)
        case TPunct("{", _) => parseStructuralBody(doc)
        case TIdent(_, _)  => ImplRef(toRef(parsePath()), doc)
        case t => throw ParseError(s"expected implementation expression, got ${show(t)}", t.pos)
      }

    private def parseStructuralBody(doc: Option[String]): StructuralImpl = {
      expectPunct("{")
      val instances   = Vector.newBuilder[Instance]
      val connections = Vector.newBuilder[Connection]
      while (!atPunct("}")) {
        // Either `name = StreamletRef<domains>;` or `endpoint -- endpoint;`
        val first = expectIdent()
        peek match {
          case TPunct("=", _) =>
            next()
            val ref = toRef(parsePath())
            val domMap = if (atPunct("<")) parseDomainAssign() else Map.empty[String, String]
            expectPunct(";")
            instances += Instance(first, ref, domMap)
          case _ =>
            val a = parseEndpointAfterIdent(first)
            expectPunct("--")
            val b = parseEndpoint()
            expectPunct(";")
            connections += Connection(a, b)
        }
      }
      expectPunct("}")
      StructuralImpl(instances.result(), connections.result(), doc)
    }

    /** Instance domain assignment, e.g. `<'parent_dom, 'inst_dom2 = 'parent_dom2>`:
      * a bare `'d` maps the instance's domain `d` to the parent's domain `d`;
      * `'a = 'b` maps instance domain `a` to parent domain `b` (paper §7.2).
      */
    private def parseDomainAssign(): Map[String, String] = {
      expectPunct("<")
      val m = mutable.LinkedHashMap.empty[String, String]
      while (!atPunct(">")) {
        expectPunct("'")
        val instDom = expectIdent()
        if (atPunct("=")) {
          next(); expectPunct("'")
          m(instDom) = expectIdent()
        } else m(instDom) = instDom
        if (atPunct(",")) next() else if (!atPunct(">")) fail("expected ',' or '>'")
      }
      expectPunct(">")
      m.toMap
    }

    private def parseEndpoint(): Endpoint = parseEndpointAfterIdent(expectIdent())

    private def parseEndpointAfterIdent(first: String): Endpoint =
      if (atPunct(".")) { next(); InstancePort(first, expectIdent()) }
      else ParentPort(first)

    private def toRef(path: Vector[String]): Ref = Ref(path.init, path.last)

    // ---- streamlets ----

    private def parseStreamletDecl(ns: NsBuilder, doc: Option[String]): Unit = {
      val name  = expectIdent()
      expectPunct("=")
      val iface = parseInterfaceExpr(ns)
      val impl: Option[Implementation] =
        if (atPunct("{")) Some(parseStreamletImpl()) else None
      expectPunct(";")
      if (ns.streamlets.contains(name)) fail(s"duplicate streamlet declaration '$name'")
      ns.streamlets(name) = Streamlet(name, iface, impl, doc)
    }

    /** The implementation attached to a streamlet, in braces: a linked path,
      * a reference to a declared impl, or inline structural statements.
      */
    private def parseStreamletImpl(): Implementation = {
      // Peek inside the braces without consuming them when structural.
      peek match {
        case TPunct("{", _) =>
          tokens(i + 1) match {
            case TString(_, _) =>
              next()
              val impl = LinkedImpl(expectString(), None)
              expectPunct("}")
              impl
            case TIdent(_, _) if isPunctAt(i + 2, "}") =>
              next()
              val ref = ImplRef(Ref.local(expectIdent()), None)
              expectPunct("}")
              ref
            case _ => parseStructuralBody(None)
          }
        case t => throw ParseError(s"expected '{', got ${show(t)}", t.pos)
      }
    }

    private def isPunctAt(idx: Int, p: String): Boolean =
      idx < tokens.size && (tokens(idx) match {
        case TPunct(`p`, _) => true
        case _              => false
      })

    // ---- tests (paper §6) ----

    private def parseTestDecl(ns: NsBuilder, doc: Option[String]): Unit = {
      val name = expectIdent()
      expectKeyword("on")
      val uut = toRef(parsePath())
      expectPunct("{")
      val stmts = Vector.newBuilder[TestStmt]
      while (!atPunct("}")) stmts += parseTestStmt()
      expectPunct("}")
      if (atPunct(";")) next()
      env.tests += TestDecl(ns.path, name, uut, stmts.result(), doc)
    }

    private def parseTestStmt(): TestStmt = peek match {
      case TIdent("sequence", _) =>
        next()
        val name = expectString()
        expectPunct("{")
        val stages = Vector.newBuilder[(String, Vector[TestStmt])]
        while (!atPunct("}")) {
          val stageName = expectString()
          expectPunct(":")
          expectPunct("{")
          val inner = Vector.newBuilder[TestStmt]
          while (!atPunct("}")) inner += parseTestStmt()
          expectPunct("}")
          stages += ((stageName, inner.result()))
          if (atPunct(",")) next()
        }
        expectPunct("}")
        if (atPunct(";")) next()
        SequenceAssert(name, stages.result())
      case _ =>
        // `uut.port = data;` — the leading instance name is the unit under
        // test and is redundant; `port = data;` is also accepted.
        val first = expectIdent()
        val port  = if (atPunct(".")) { next(); expectIdent() } else first
        expectPunct("=")
        val data = parseDataLit()
        expectPunct(";")
        PortAssert(port, data)
    }

    private def parseDataLit(): DataLit = peek match {
      case TString(s, _) => next(); ElemLit(s)
      case TPunct("(", _) =>
        next()
        val items = Vector.newBuilder[DataLit]
        while (!atPunct(")")) {
          items += parseDataLit()
          if (atPunct(",")) next() else if (!atPunct(")")) fail("expected ',' or ')'")
        }
        expectPunct(")")
        SeriesLit(items.result())
      case TPunct("[", _) =>
        next()
        val items = Vector.newBuilder[DataLit]
        while (!atPunct("]")) {
          items += parseDataLit()
          if (atPunct(",")) next() else if (!atPunct("]")) fail("expected ',' or ']'")
        }
        expectPunct("]")
        DimLit(items.result())
      case TPunct("{", _) =>
        next()
        val fields = Vector.newBuilder[(String, DataLit)]
        while (!atPunct("}")) {
          val n = expectIdent()
          expectPunct(":")
          fields += ((n, parseDataLit()))
          if (atPunct(",")) next() else if (!atPunct("}")) fail("expected ',' or '}'")
        }
        expectPunct("}")
        FieldLit(fields.result())
      case t => throw ParseError(s"expected data literal, got ${show(t)}", t.pos)
    }
  }
}
