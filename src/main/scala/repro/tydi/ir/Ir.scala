package repro.tydi.ir

import repro.tydi.types._

/** Direction of a port on an Interface: carries a logical Stream either into
  * or out of the component (paper §4.2.1).
  */
sealed abstract class PortDirection(val name: String)
case object In  extends PortDirection("in")
case object Out extends PortDirection("out")

/** A port of an Interface. Documentation is an actual property, not a
  * comment: backends are expected to implement it (paper §4.2.1).
  *
  * @param domain clock/reset domain name; None = the Interface's default domain
  */
final case class Port(
    name: String,
    direction: PortDirection,
    tpe: TStream,
    domain: Option[String] = None,
    doc: Option[String] = None,
)

/** An Interface: a collection of ports plus zero or more uniquely named
  * clock/reset domains. When no domain is declared, a default domain is
  * created and assigned to all ports (paper §4.2.1).
  */
final case class Interface(
    ports: Vector[Port],
    domains: Vector[String] = Vector.empty,
    doc: Option[String] = None,
) {
  /** The domain a port actually belongs to, after defaulting. */
  def domainOf(p: Port): String = p.domain.getOrElse(Interface.DefaultDomain)

  def port(name: String): Option[Port] = ports.find(_.name == name)

  /** All domains in use: declared ones, plus the default if any port needs it. */
  def effectiveDomains: Vector[String] = {
    val used = ports.map(domainOf).distinct
    (domains ++ used).distinct
  }
}
object Interface {
  val DefaultDomain = "default"
  def of(ports: Port*): Interface = Interface(ports.toVector)
}

/** A reference to a declaration, optionally qualified by namespace path. */
final case class Ref(namespace: Vector[String], name: String) {
  override def toString: String = (namespace :+ name).mkString("::")
}
object Ref {
  def local(name: String): Ref = Ref(Vector.empty, name)
}

/** An endpoint of a connection: a port on the enclosing Streamlet, or a port
  * on a named instance within a structural implementation (paper §5.1).
  */
sealed trait Endpoint { def show: String }
final case class ParentPort(port: String) extends Endpoint {
  def show: String = port
}
final case class InstancePort(instance: String, port: String) extends Endpoint {
  def show: String = s"$instance.$port"
}

/** A connection between two ports. Connections are explicitly not
  * assignments: source and sink are determined per resulting physical stream
  * during lowering (paper §5.1).
  */
final case class Connection(a: Endpoint, b: Endpoint) {
  def show: String = s"${a.show} -- ${b.show}"
}

/** An instance of a Streamlet inside a structural implementation.
  *
  * @param domainMap maps each domain of the instantiated Streamlet's
  *                  interface onto a domain of the enclosing interface; an
  *                  unmapped instance domain takes the like-named (or
  *                  default) parent domain.
  */
final case class Instance(
    name: String,
    streamlet: Ref,
    domainMap: Map[String, String] = Map.empty,
)

/** The two kinds of Streamlet implementation (paper §5): a *structural*
  * implementation combining Streamlet instances, or a *link* to behavior
  * expressed in a target language (resolved by each backend).
  */
sealed trait Implementation { def doc: Option[String] }

final case class LinkedImpl(path: String, doc: Option[String] = None) extends Implementation

final case class StructuralImpl(
    instances: Vector[Instance],
    connections: Vector[Connection],
    doc: Option[String] = None,
) extends Implementation

/** A named reference to a separately declared implementation. */
final case class ImplRef(ref: Ref, doc: Option[String] = None) extends Implementation

/** A Streamlet: an Interface plus optionally an Implementation; the intended
  * output of a project (paper §5).
  */
final case class Streamlet(
    name: String,
    interface: Interface,
    impl: Option[Implementation] = None,
    doc: Option[String] = None,
) {
  /** Subsetting a Streamlet to its Interface (paper §5): used for alternate
    * implementations of the same component and for substitutions (§6.2).
    */
  def subset: Interface = interface
}

/** A namespace: a simple container for declarations; its path is purely
  * abstract and only communicates hierarchy to backends (paper §7.2).
  */
final case class Namespace(
    path: Vector[String],
    types: Map[String, LogicalType] = Map.empty,
    interfaces: Map[String, Interface] = Map.empty,
    streamlets: Map[String, Streamlet] = Map.empty,
    impls: Map[String, Implementation] = Map.empty,
) {
  def pathName: String = path.mkString("::")
}

/** A Project: the root input of the toolchain; the primary output of the
  * query system is its "all streamlets" query (paper §7.1).
  */
final case class Project(namespaces: Vector[Namespace]) {

  def namespace(path: Vector[String]): Option[Namespace] =
    namespaces.find(_.path == path)

  /** Resolve a reference from within `from`: local namespace first, then any
    * namespace whose path matches the reference's qualifier.
    */
  def resolveStreamlet(from: Namespace, ref: Ref): Option[(Namespace, Streamlet)] =
    if (ref.namespace.isEmpty) from.streamlets.get(ref.name).map((from, _))
    else namespace(ref.namespace).flatMap(ns => ns.streamlets.get(ref.name).map((ns, _)))

  def resolveImpl(from: Namespace, ref: Ref): Option[Implementation] =
    if (ref.namespace.isEmpty) from.impls.get(ref.name)
    else namespace(ref.namespace).flatMap(_.impls.get(ref.name))

  /** All Streamlet declarations with their namespaces — the toolchain's
    * primary query (paper §7.1).
    */
  def allStreamlets: Vector[(Namespace, Streamlet)] =
    namespaces.flatMap(ns => ns.streamlets.values.toVector.sortBy(_.name).map((ns, _)))

  /** Follow ImplRef chains to a concrete implementation. */
  def concreteImpl(from: Namespace, impl: Implementation): Option[Implementation] =
    impl match {
      case ImplRef(ref, _) => resolveImpl(from, ref).flatMap(concreteImpl(from, _))
      case other           => Some(other)
    }
}
object Project {
  def of(ns: Namespace*): Project = Project(ns.toVector)
}
