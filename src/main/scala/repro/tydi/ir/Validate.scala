package repro.tydi.ir

import repro.tydi.physical.Lowering
import repro.tydi.types.Compat

/** Static validation of a Project, codifying the rules of paper §4.2.2 and
  * §5.1:
  *
  *  - port names unique within an interface; port domains declared;
  *  - every port's logical Stream lowers without error (catches §8.1(1));
  *  - connections require identical logical types and identical clock
  *    domains; complexity differences are type differences (§4.2.2);
  *  - connection direction: for each connection, exactly one endpoint acts
  *    as a source (an `in` port of the enclosing Streamlet, or an `out` port
  *    of an instance) and one as a sink;
  *  - every port of the enclosing Streamlet and of every instance is
  *    connected to exactly one other port — no dangling ports, no
  *    one-to-many or many-to-one connections (§5.1).
  */
object Validate {

  final case class ValidationError(context: String, message: String) {
    override def toString: String = s"[$context] $message"
  }

  def project(p: Project): Vector[ValidationError] =
    p.namespaces.flatMap(ns => namespace(p, ns))

  def namespace(p: Project, ns: Namespace): Vector[ValidationError] = {
    val ifaceErrs = ns.interfaces.toVector.sortBy(_._1).flatMap { case (n, i) =>
      interface(i, s"${ns.pathName}::$n")
    }
    val slErrs = ns.streamlets.values.toVector.sortBy(_.name).flatMap { sl =>
      streamlet(p, ns, sl)
    }
    ifaceErrs ++ slErrs
  }

  def interface(i: Interface, context: String): Vector[ValidationError] = {
    val errs = Vector.newBuilder[ValidationError]
    val dupPorts = i.ports.groupBy(_.name).collect { case (n, ps) if ps.size > 1 => n }
    dupPorts.foreach(n => errs += ValidationError(context, s"duplicate port name '$n'"))
    val declared = (i.domains :+ Interface.DefaultDomain).toSet
    for (port <- i.ports) {
      port.domain.foreach { d =>
        if (!declared.contains(d) && i.domains.nonEmpty)
          errs += ValidationError(context, s"port '${port.name}' references undeclared domain '$d")
      }
      Lowering.split(port.tpe).left.foreach { e =>
        errs += ValidationError(context, s"port '${port.name}': ${e.message}")
      }
    }
    errs.result()
  }

  def streamlet(p: Project, ns: Namespace, sl: Streamlet): Vector[ValidationError] = {
    val ctx  = s"${ns.pathName}::${sl.name}"
    val base = interface(sl.interface, ctx)
    val implErrs = sl.impl.toVector.flatMap { impl =>
      p.concreteImpl(ns, impl) match {
        case None =>
          Vector(ValidationError(ctx, s"implementation reference does not resolve: $impl"))
        case Some(s: StructuralImpl) => structural(p, ns, sl, s)
        case Some(_: LinkedImpl)     => Vector.empty
        case Some(_: ImplRef)        => Vector.empty // unreachable after concreteImpl
      }
    }
    base ++ implErrs
  }

  /** Whether an endpoint acts as a source within a structural implementation:
    * data enters the structure through the enclosing Streamlet's `in` ports
    * and through instances' `out` ports.
    */
  private def actsAsSource(dir: PortDirection, isParent: Boolean): Boolean =
    if (isParent) dir == In else dir == Out

  def structural(
      p: Project,
      ns: Namespace,
      sl: Streamlet,
      impl: StructuralImpl,
  ): Vector[ValidationError] = {
    val ctx  = s"${ns.pathName}::${sl.name}"
    val errs = Vector.newBuilder[ValidationError]

    // Resolve instances.
    val dupInst = impl.instances.groupBy(_.name).collect { case (n, is) if is.size > 1 => n }
    dupInst.foreach(n => errs += ValidationError(ctx, s"duplicate instance name '$n'"))
    val resolved: Map[String, Streamlet] = impl.instances.flatMap { inst =>
      p.resolveStreamlet(ns, inst.streamlet) match {
        case Some((_, s)) => Some(inst.name -> s)
        case None =>
          errs += ValidationError(ctx, s"instance '${inst.name}' references unknown streamlet ${inst.streamlet}")
          None
      }
    }.toMap
    val domainMaps: Map[String, Map[String, String]] =
      impl.instances.map(i => i.name -> i.domainMap).toMap

    // Validate instance domain maps.
    for (inst <- impl.instances; target <- resolved.get(inst.name)) {
      val instDomains   = target.interface.effectiveDomains.toSet
      val parentDomains = sl.interface.effectiveDomains.toSet + Interface.DefaultDomain
      inst.domainMap.foreach { case (instDom, parentDom) =>
        if (!instDomains.contains(instDom))
          errs += ValidationError(ctx,
            s"instance '${inst.name}' maps unknown instance domain '$instDom'")
        if (!parentDomains.contains(parentDom))
          errs += ValidationError(ctx,
            s"instance '${inst.name}' maps domain '$instDom' to unknown parent domain '$parentDom'")
      }
    }

    // Resolve an endpoint to (port, actsAsSource, effective parent domain).
    def resolveEndpoint(e: Endpoint): Option[(Port, Boolean, String)] = e match {
      case ParentPort(name) =>
        sl.interface.port(name) match {
          case Some(port) =>
            Some((port, actsAsSource(port.direction, isParent = true),
              sl.interface.domainOf(port)))
          case None =>
            errs += ValidationError(ctx, s"connection references unknown port '$name'")
            None
        }
      case InstancePort(instName, portName) =>
        resolved.get(instName) match {
          case None => None // instance error already reported
          case Some(target) =>
            target.interface.port(portName) match {
              case Some(port) =>
                val instDom   = target.interface.domainOf(port)
                val parentDom = domainMaps.getOrElse(instName, Map.empty)
                  .getOrElse(instDom, instDom)
                Some((port, actsAsSource(port.direction, isParent = false), parentDom))
              case None =>
                errs += ValidationError(ctx,
                  s"connection references unknown port '$instName.$portName'")
                None
            }
        }
    }

    // Per-connection checks: type identity, domain identity, direction.
    for (conn <- impl.connections) {
      (resolveEndpoint(conn.a), resolveEndpoint(conn.b)) match {
        case (Some((pa, srcA, domA)), Some((pb, srcB, domB))) =>
          if (!Compat.compatible(pa.tpe, pb.tpe)) {
            val why = Compat.explainMismatch(pa.tpe, pb.tpe).getOrElse("types differ")
            errs += ValidationError(ctx, s"connection ${conn.show}: incompatible types ($why)")
          }
          if (domA != domB)
            errs += ValidationError(ctx,
              s"connection ${conn.show}: clock domains differ ('$domA' vs '$domB')")
          if (srcA == srcB)
            errs += ValidationError(ctx,
              s"connection ${conn.show}: needs exactly one source and one sink, " +
                s"got ${if (srcA) "two sources" else "two sinks"}")
        case _ => // endpoint errors already reported
      }
    }

    // Exactly-once connectivity for every port (paper §5.1: leaving ports
    // unconnected is against the Tydi specification; one-to-many and
    // many-to-one are not allowed).
    val expected: Vector[Endpoint] =
      sl.interface.ports.map(p => ParentPort(p.name): Endpoint) ++
        impl.instances.flatMap { inst =>
          resolved.get(inst.name).toVector.flatMap(
            _.interface.ports.map(p => InstancePort(inst.name, p.name): Endpoint))
        }
    val usage: Map[Endpoint, Int] =
      impl.connections.flatMap(c => Vector(c.a, c.b)).groupBy(identity).view.mapValues(_.size).toMap
    for (e <- expected) {
      usage.getOrElse(e, 0) match {
        case 0 => errs += ValidationError(ctx, s"port ${e.show} is unconnected " +
          "(the Tydi specification requires every port be driven)")
        case 1 => // ok
        case n => errs += ValidationError(ctx, s"port ${e.show} is connected $n times " +
          "(one-to-many/many-to-one connections are not allowed)")
      }
    }

    errs.result()
  }
}
