package repro.tydi.spec

import repro.tydi.ir._
import repro.tydi.types._

/** Transaction-level behavior of a component under test: one *parallel
  * evaluation* maps the data driven on its input-acting ports to the data
  * observed on its output-acting ports (paper §6.1 — ports are verified in
  * parallel by default; each transfer still requires a valid handshake, so
  * stateless behavior is fully described by this function).
  *
  * Keys are `port` or `port.field` (for ports whose Stream carries child
  * Streams, e.g. a Reversed response stream).
  */
trait Behavior {
  def evaluate(driven: Map[String, DataValue]): Map[String, DataValue]
}

/** A behavior with internal state, required for `sequence` assertions: state
  * persists across stages and is cleared by `reset` before a test.
  */
trait StatefulBehavior extends Behavior {
  def reset(): Unit
}

object Behavior {
  def pure(f: Map[String, DataValue] => Map[String, DataValue]): Behavior =
    (driven: Map[String, DataValue]) => f(driven)
}

/** Executes test declarations (paper §6.1) against a [[Behavior]]:
  *
  *  - plain port assertions are evaluated in parallel (one evaluation);
  *  - whether a datum is driven or observed-and-compared is determined
  *    automatically from the direction of the port (and, for per-field
  *    transactions, from the direction of the child Stream);
  *  - `sequence` stages run in order and a failing stage stops the sequence.
  */
object TestHarness {

  final case class Failure(context: String, message: String) {
    override def toString: String = s"[$context] $message"
  }

  final case class Target(port: String, field: Option[String], data: DataLit) {
    def key: String = field.fold(port)(f => s"$port.$f")
  }

  /** Flatten an assertion into per-target (port or port.field) assertions. */
  private def targets(a: PortAssert): Vector[Target] = a.data match {
    case FieldLit(fields) => fields.map { case (n, lit) => Target(a.port, Some(n), lit) }
    case other            => Vector(Target(a.port, None, other))
  }

  /** Whether the data asserted on a target is driven by the test (true) or
    * observed and compared (false), per paper §6.1 property 2.
    */
  def drives(iface: Interface, t: Target): Either[String, Boolean] =
    iface.port(t.port) match {
      case None => Left(s"unknown port '${t.port}'")
      case Some(p) =>
        t.field match {
          case None => Right(p.direction == In)
          case Some(f) =>
            childStream(p.tpe, f) match {
              case None => Left(s"port '${t.port}' has no child stream field '$f'")
              case Some(child) =>
                val reversed = child.direction == Reverse
                Right((p.direction == In) ^ reversed)
            }
        }
    }

  /** The child Stream carried under field `name` of the port's data type. */
  private def childStream(s: TStream, name: String): Option[TStream] = s.data match {
    case TGroup(fs) => fs.collectFirst { case Field(`name`, c: TStream) => c }
    case TUnion(fs) => fs.collectFirst { case Field(`name`, c: TStream) => c }
    case _          => None
  }

  def run(test: TestDecl, streamlet: Streamlet, behavior: Behavior): Vector[Failure] = {
    behavior match {
      case s: StatefulBehavior => s.reset()
      case _                   =>
    }
    val (plain, sequences) = test.stmts.partition(_.isInstanceOf[PortAssert])
    val failures = Vector.newBuilder[Failure]
    if (plain.nonEmpty)
      failures ++= runStage(s"${test.name}", plain.collect { case p: PortAssert => p },
        streamlet, behavior)
    for (SequenceAssert(name, stages) <- sequences.collect { case s: SequenceAssert => s }) {
      var failed = false
      for ((stageName, stmts) <- stages if !failed) {
        val asserts = stmts.collect { case p: PortAssert => p }
        val fs = runStage(s"${test.name}/$name/$stageName", asserts, streamlet, behavior)
        if (fs.nonEmpty) { failures ++= fs; failed = true }
      }
    }
    failures.result()
  }

  private def runStage(
      context: String,
      asserts: Vector[PortAssert],
      streamlet: Streamlet,
      behavior: Behavior,
  ): Vector[Failure] = {
    val iface = streamlet.interface
    val all   = asserts.flatMap(targets)
    val failures = Vector.newBuilder[Failure]

    val resolved: Vector[(Target, Boolean)] = all.flatMap { t =>
      drives(iface, t) match {
        case Left(err)  => failures += Failure(context, err); None
        case Right(dir) => Some((t, dir))
      }
    }
    val driven = resolved.collect { case (t, true) =>
      t.key -> DataValue.fromLit(t.data)
    }.toMap
    val expected = resolved.collect { case (t, false) => (t.key, DataValue.fromLit(t.data)) }

    val observed =
      try behavior.evaluate(driven)
      catch {
        case e: Exception =>
          failures += Failure(context, s"behavior raised ${e.getClass.getSimpleName}: ${e.getMessage}")
          return failures.result()
      }

    for ((key, want) <- expected) {
      observed.get(key) match {
        case None =>
          failures += Failure(context, s"no transaction observed on '$key'")
        case Some(got) if got != want =>
          failures += Failure(context,
            s"'$key': expected ${want.render}, observed ${got.render}")
        case _ =>
      }
    }
    failures.result()
  }
}

/** Substitutions (paper §6.2): replace a Streamlet's implementation — e.g. a
  * dependency that cannot be simulated — with a stub, mock or known-good
  * alternative that exposes the same Interface. Because Streamlets can be
  * subsetted to Interfaces, any implementation of that Interface is a valid
  * substitute.
  */
object Substitute {

  final case class SubstituteError(message: String) extends RuntimeException(message)

  /** Replace the implementation of `target` in the project, verifying the
    * substitute fits the original's Interface.
    */
  def impl(project: Project, target: Ref, substitute: Streamlet): Project = {
    val nsPath = target.namespace
    val ns = project.namespace(nsPath).getOrElse(
      throw SubstituteError(s"unknown namespace ${nsPath.mkString("::")}"))
    val original = ns.streamlets.getOrElse(target.name,
      throw SubstituteError(s"unknown streamlet $target"))
    val origIface = original.subset
    val subIface  = substitute.subset
    val sameShape = origIface.ports.size == subIface.ports.size &&
      origIface.ports.sortBy(_.name).zip(subIface.ports.sortBy(_.name)).forall {
        case (a, b) => a.name == b.name && a.direction == b.direction &&
          repro.tydi.types.Compat.compatible(a.tpe, b.tpe)
      }
    if (!sameShape)
      throw SubstituteError(
        s"substitute for $target does not implement the same Interface")
    val newNs = ns.copy(streamlets =
      ns.streamlets.updated(target.name, original.copy(impl = substitute.impl)))
    Project(project.namespaces.map(n => if (n.path == nsPath) newNs else n))
  }
}
