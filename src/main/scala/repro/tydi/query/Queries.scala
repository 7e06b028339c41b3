package repro.tydi.query

import repro.tydi.ir._
import repro.tydi.physical.{Lowering, PhysicalStream, Signal, Signals}
import repro.tydi.types.TStream

/** The Tydi toolchain's query schema (paper §7.1): namespaces are the inputs;
  * "all streamlets", stream splitting, signal computation and validation are
  * derived queries. Backends pull from these so that edits recompute only
  * what actually changed.
  */
final class Queries private (val db: QueryDb) {

  /** Replace the declarations of one namespace (an input). */
  def setNamespace(ns: Namespace): Unit = db.setInput("namespace", ns.path, ns)

  def removeNamespace(path: Vector[String]): Unit = db.removeInput("namespace", path)

  /** Load a whole project, replacing all namespaces. */
  def setProject(p: Project): Unit = {
    val keep = p.namespaces.map(_.path).toSet
    db.inputArgs("namespace").foreach {
      case path: Vector[_] if !keep.contains(path.asInstanceOf[Vector[String]]) =>
        db.removeInput("namespace", path)
      case _ =>
    }
    p.namespaces.foreach(setNamespace)
  }

  /** The assembled Project (derived from the namespace inputs). */
  def project: Project = db.get[Project]("project")

  /** The primary output query: all Streamlet declarations (paper §7.1). */
  def allStreamlets: Vector[(Namespace, Streamlet)] =
    db.get[Vector[(Namespace, Streamlet)]]("allStreamlets")

  /** Split a logical Stream into physical streams (memoized per type). */
  def physicalStreams(t: TStream): Vector[PhysicalStream] =
    db.get[Vector[PhysicalStream]]("physicalStreams", t)

  /** The hardware signals of one physical stream. */
  def signals(ps: PhysicalStream): Vector[Signal] =
    db.get[Vector[Signal]]("signals", ps)

  /** Validation errors for the whole project. */
  def validationErrors: Vector[Validate.ValidationError] =
    db.get[Vector[Validate.ValidationError]]("validationErrors")
}

object Queries {

  def apply(): Queries = {
    val db = new QueryDb
    db.define[Unit, Project]("project") { _ =>
      val paths = db.inputArgs("namespace").collect { case p: Vector[_] =>
        p.asInstanceOf[Vector[String]]
      }
      Project(paths.sortBy(_.mkString("::")).map(p => db.input[Namespace]("namespace", p)))
    }
    db.define[Unit, Vector[(Namespace, Streamlet)]]("allStreamlets") { _ =>
      db.get[Project]("project").allStreamlets
    }
    db.define[TStream, Vector[PhysicalStream]]("physicalStreams") { t =>
      Lowering.splitOrThrow(t)
    }
    db.define[PhysicalStream, Vector[Signal]]("signals") { ps =>
      Signals.of(ps)
    }
    db.define[Unit, Vector[Validate.ValidationError]]("validationErrors") { _ =>
      Validate.project(db.get[Project]("project"))
    }
    new Queries(db)
  }

  def forProject(p: Project): Queries = {
    val q = Queries()
    q.setProject(p)
    q
  }
}
