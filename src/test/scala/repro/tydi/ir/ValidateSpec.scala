package repro.tydi.ir

import repro.SparkSpec
import repro.tydi.types._

class ValidateSpec extends SparkSpec {

  private val streamA = TStream(TBits(8), complexity = 2)
  private val streamB = TStream(TBits(16), complexity = 2)

  /** A pass-through leaf: one in, one out of the same type. */
  private def leaf(name: String, t: TStream = streamA): Streamlet =
    Streamlet(name, Interface.of(Port("x", In, t), Port("y", Out, t)))

  private def projectWith(sl: Streamlet*): (Project, Namespace) = {
    val ns = Namespace(Vector("test"), streamlets = sl.map(s => s.name -> s).toMap)
    (Project.of(ns), ns)
  }

  private def top(impl: StructuralImpl): Streamlet =
    Streamlet("top", Interface.of(Port("a", In, streamA), Port("b", Out, streamA)),
      Some(impl))

  // A correct single-instance wiring: a -> inst.x, inst.y -> b.
  private val okImpl = StructuralImpl(
    Vector(Instance("inst", Ref.local("leaf"))),
    Vector(
      Connection(ParentPort("a"), InstancePort("inst", "x")),
      Connection(InstancePort("inst", "y"), ParentPort("b"))))

  test("a well-formed structural design validates cleanly") {
    val (p, ns) = projectWith(leaf("leaf"), top(okImpl))
    assert(Validate.project(p).isEmpty)
  }

  test("duplicate port names are rejected") {
    val i = Interface.of(Port("p", In, streamA), Port("p", Out, streamA))
    assert(Validate.interface(i, "ctx").exists(_.message.contains("duplicate port")))
  }

  test("a port whose Stream fails to lower is reported (catches §8.1(1))") {
    val bad = TStream(TStream(TBits(8), complexity = 2, keep = true), user = Some(TBits(1)))
    val i = Interface.of(Port("p", In, bad))
    assert(Validate.interface(i, "ctx").exists(_.message.contains("uniquely named")))
  }

  test("connections require identical logical types") {
    val badLeaf = leaf("leaf", streamB)
    val (p, _) = projectWith(badLeaf, top(okImpl))
    val errs = Validate.project(p)
    assert(errs.exists(_.message.contains("incompatible types")))
  }

  test("complexity differences make port types incompatible (§4.2.2)") {
    val cLeaf = leaf("leaf", streamA.copy(complexity = 5))
    val (p, _) = projectWith(cLeaf, top(okImpl))
    assert(Validate.project(p).exists(_.message.contains("incompatible types")))
  }

  test("every port must be connected exactly once — unconnected is an error") {
    val impl = StructuralImpl(
      Vector(Instance("inst", Ref.local("leaf"))),
      Vector(Connection(ParentPort("a"), InstancePort("inst", "x"))))
    val (p, _) = projectWith(leaf("leaf"), top(impl))
    val errs = Validate.project(p)
    assert(errs.exists(e => e.message.contains("inst.y") && e.message.contains("unconnected")))
    assert(errs.exists(e => e.message.contains("b") && e.message.contains("unconnected")))
  }

  test("one-to-many connections are not allowed (§5.1)") {
    val twoSinks = Streamlet("top",
      Interface.of(Port("a", In, streamA), Port("b", Out, streamA), Port("c", Out, streamA)),
      Some(StructuralImpl(
        Vector(Instance("inst", Ref.local("leaf"))),
        Vector(
          Connection(ParentPort("a"), InstancePort("inst", "x")),
          Connection(InstancePort("inst", "y"), ParentPort("b")),
          Connection(InstancePort("inst", "y"), ParentPort("c"))))))
    val (p, _) = projectWith(leaf("leaf"), twoSinks)
    assert(Validate.project(p).exists(_.message.contains("connected 2 times")))
  }

  test("a connection needs exactly one source and one sink") {
    // Two parent in-ports: both act as sources inside the structure.
    val bad = Streamlet("top",
      Interface.of(Port("a", In, streamA), Port("b", In, streamA)),
      Some(StructuralImpl(Vector.empty,
        Vector(Connection(ParentPort("a"), ParentPort("b"))))))
    val (p, _) = projectWith(bad)
    assert(Validate.project(p).exists(_.message.contains("two sources")))
  }

  test("parent in to parent out is a valid pass-through") {
    val pass = Streamlet("top",
      Interface.of(Port("a", In, streamA), Port("b", Out, streamA)),
      Some(StructuralImpl(Vector.empty,
        Vector(Connection(ParentPort("a"), ParentPort("b"))))))
    val (p, _) = projectWith(pass)
    assert(Validate.project(p).isEmpty)
  }

  test("unknown instance streamlet references are reported") {
    val impl = StructuralImpl(Vector(Instance("inst", Ref.local("nope"))), Vector.empty)
    val (p, _) = projectWith(top(impl.copy(connections = Vector(
      Connection(ParentPort("a"), ParentPort("b"))))))
    assert(Validate.project(p).exists(_.message.contains("unknown streamlet")))
  }

  test("unknown ports in connections are reported") {
    val impl = StructuralImpl(
      Vector(Instance("inst", Ref.local("leaf"))),
      Vector(
        Connection(ParentPort("zzz"), InstancePort("inst", "x")),
        Connection(InstancePort("inst", "y"), ParentPort("b"))))
    val (p, _) = projectWith(leaf("leaf"), top(impl))
    assert(Validate.project(p).exists(_.message.contains("unknown port 'zzz'")))
  }

  test("duplicate instance names are reported") {
    val impl = StructuralImpl(
      Vector(Instance("i", Ref.local("leaf")), Instance("i", Ref.local("leaf"))),
      Vector.empty)
    val (p, _) = projectWith(leaf("leaf"),
      Streamlet("top", Interface.of(), Some(impl)))
    assert(Validate.project(p).exists(_.message.contains("duplicate instance")))
  }

  // ---- clock domains (§4.2.1) ----

  test("ports in different clock domains cannot be connected") {
    val topSl = Streamlet("top",
      Interface(Vector(
        Port("a", In, streamA, domain = Some("fast")),
        Port("b", Out, streamA, domain = Some("slow"))),
        domains = Vector("fast", "slow")),
      Some(StructuralImpl(Vector.empty,
        Vector(Connection(ParentPort("a"), ParentPort("b"))))))
    val (p, _) = projectWith(topSl)
    assert(Validate.project(p).exists(_.message.contains("clock domains differ")))
  }

  test("instance domain mapping aligns domains across the boundary") {
    val clocked = Streamlet("leaf",
      Interface(Vector(
        Port("x", In, streamA, domain = Some("d")),
        Port("y", Out, streamA, domain = Some("d"))),
        domains = Vector("d")))
    val topSl = Streamlet("top",
      Interface(Vector(
        Port("a", In, streamA, domain = Some("fast")),
        Port("b", Out, streamA, domain = Some("fast"))),
        domains = Vector("fast")),
      Some(StructuralImpl(
        Vector(Instance("i", Ref.local("leaf"), Map("d" -> "fast"))),
        Vector(
          Connection(ParentPort("a"), InstancePort("i", "x")),
          Connection(InstancePort("i", "y"), ParentPort("b"))))))
    val ns = Namespace(Vector("t"), streamlets = Map("leaf" -> clocked, "top" -> topSl))
    assert(Validate.project(Project.of(ns)).isEmpty)
  }

  test("an unmapped instance domain mismatches a differently named parent domain") {
    val clocked = Streamlet("leaf",
      Interface(Vector(
        Port("x", In, streamA, domain = Some("d")),
        Port("y", Out, streamA, domain = Some("d"))),
        domains = Vector("d")))
    val topSl = Streamlet("top",
      Interface(Vector(
        Port("a", In, streamA, domain = Some("fast")),
        Port("b", Out, streamA, domain = Some("fast"))),
        domains = Vector("fast")),
      Some(StructuralImpl(
        Vector(Instance("i", Ref.local("leaf"))), // no domain map
        Vector(
          Connection(ParentPort("a"), InstancePort("i", "x")),
          Connection(InstancePort("i", "y"), ParentPort("b"))))))
    val ns = Namespace(Vector("t"), streamlets = Map("leaf" -> clocked, "top" -> topSl))
    assert(Validate.project(Project.of(ns)).exists(_.message.contains("clock domains differ")))
  }

  test("a default domain is created when none is declared (§4.2.1)") {
    val i = Interface.of(Port("p", In, streamA))
    assert(i.effectiveDomains == Vector(Interface.DefaultDomain))
    assert(i.domainOf(i.ports.head) == Interface.DefaultDomain)
  }

  test("mapping an unknown instance domain is reported") {
    val impl = StructuralImpl(
      Vector(Instance("i", Ref.local("leaf"), Map("nope" -> "default"))),
      Vector(
        Connection(ParentPort("a"), InstancePort("i", "x")),
        Connection(InstancePort("i", "y"), ParentPort("b"))))
    val (p, _) = projectWith(leaf("leaf"), top(impl))
    assert(Validate.project(p).exists(_.message.contains("unknown instance domain")))
  }

  // ---- implementation references / subsetting ----

  test("impl references resolve through the namespace") {
    val ns = Namespace(Vector("t"),
      streamlets = Map(
        "leaf" -> leaf("leaf"),
        "top"  -> top(okImpl).copy(impl = Some(ImplRef(Ref.local("wiring"))))),
      impls = Map("wiring" -> okImpl))
    assert(Validate.project(Project.of(ns)).isEmpty)
  }

  test("dangling impl references are reported") {
    val ns = Namespace(Vector("t"),
      streamlets = Map("top" -> Streamlet("top", Interface.of(),
        Some(ImplRef(Ref.local("missing"))))))
    assert(Validate.project(Project.of(ns)).exists(_.message.contains("does not resolve")))
  }

  test("subsetting a Streamlet yields its Interface (§5)") {
    val sl = leaf("leaf")
    assert(sl.subset == sl.interface)
  }

  test("allStreamlets returns every declaration with its namespace") {
    val ns1 = Namespace(Vector("a"), streamlets = Map("s1" -> leaf("s1")))
    val ns2 = Namespace(Vector("b"), streamlets = Map("s2" -> leaf("s2"), "s3" -> leaf("s3")))
    val all = Project.of(ns1, ns2).allStreamlets
    assert(all.map(_._2.name) == Vector("s1", "s2", "s3"))
  }

  test("qualified references resolve across namespaces") {
    val lib = Namespace(Vector("lib"), streamlets = Map("leaf" -> leaf("leaf")))
    val use = Namespace(Vector("use"), streamlets = Map("top" -> top(
      okImpl.copy(instances = Vector(Instance("inst", Ref(Vector("lib"), "leaf")))))))
    assert(Validate.project(Project.of(lib, use)).isEmpty)
  }
}
