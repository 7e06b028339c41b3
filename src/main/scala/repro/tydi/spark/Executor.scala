package repro.tydi.spark

import scala.collection.mutable
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.tydi.ir._

final case class ExecutionError(message: String) extends RuntimeException(message)

/** Executes a Streamlet on the Spark backend (paper §5 composed with §5.2):
  *
  *  - a Streamlet with a *linked* implementation runs the kernel the registry
  *    resolves for its path;
  *  - a Streamlet with a *structural* implementation is executed by wiring
  *    DataFrames along its connections and running each instance — recursion
  *    makes nested structural designs a single composed Catalyst plan;
  *  - a Streamlet without an implementation cannot be executed (it is an
  *    interface template) and raises an error.
  *
  * The executor performs the IR's validation first, so only well-formed
  * designs (every port connected exactly once, compatible types and domains)
  * reach Spark. DataFrames are validated against the port contracts of every
  * crossing (see [[SparkTypes.validateFrame]]).
  *
  * Reversed child Streams pair request/response at the transfer level; at the
  * batch dataflow level every port still has a single owner direction, so
  * frames flow from `in` ports and instance `out` ports to their connected
  * sinks, mirroring how the VHDL backend determines sources during lowering.
  */
final class DataflowExecutor(project: Project, registry: KernelRegistry) {

  def execute(
      spark: SparkSession,
      nsPath: Vector[String],
      streamletName: String,
      inputs: Map[String, DataFrame],
      validate: Boolean = true,
  ): Map[String, DataFrame] = {
    val ns = project.namespace(nsPath).getOrElse(
      throw ExecutionError(s"unknown namespace ${nsPath.mkString("::")}"))
    val sl = ns.streamlets.getOrElse(streamletName,
      throw ExecutionError(s"unknown streamlet $streamletName"))
    if (validate) {
      val errs = Validate.streamlet(project, ns, sl)
      if (errs.nonEmpty)
        throw ExecutionError(s"validation failed:\n  ${errs.mkString("\n  ")}")
    }
    run(spark, ns, sl, inputs)
  }

  private def run(
      spark: SparkSession,
      ns: Namespace,
      sl: Streamlet,
      inputs: Map[String, DataFrame],
  ): Map[String, DataFrame] = {
    val inPorts  = sl.interface.ports.filter(_.direction == In)
    val outPorts = sl.interface.ports.filter(_.direction == Out)
    val missing  = inPorts.map(_.name).filterNot(inputs.contains)
    if (missing.nonEmpty)
      throw ExecutionError(s"streamlet ${sl.name}: missing input frames for ${missing.mkString(", ")}")
    for (p <- inPorts)
      SparkTypes.validateFrame(s"${sl.name}.${p.name}", inputs(p.name), p.tpe)
        .left.foreach(e => throw ExecutionError(e))

    val outputs = project.concreteImpl(ns, sl.impl.getOrElse(
      throw ExecutionError(s"streamlet ${sl.name} has no implementation to execute"))) match {
      case Some(LinkedImpl(path, _)) =>
        val kernel = registry.resolve(path).getOrElse(
          throw ExecutionError(s"no kernel registered for linked path '$path' (streamlet ${sl.name})"))
        kernel(spark, inputs.view.filterKeys(inPorts.map(_.name).contains).toMap)
      case Some(s: StructuralImpl) =>
        runStructural(spark, ns, sl, s, inputs)
      case other =>
        throw ExecutionError(s"streamlet ${sl.name}: cannot execute implementation $other")
    }

    val missingOut = outPorts.map(_.name).filterNot(outputs.contains)
    if (missingOut.nonEmpty)
      throw ExecutionError(
        s"streamlet ${sl.name}: implementation produced no frame for ${missingOut.mkString(", ")}")
    for (p <- outPorts)
      SparkTypes.validateFrame(s"${sl.name}.${p.name}", outputs(p.name), p.tpe)
        .left.foreach(e => throw ExecutionError(e))
    outputs.view.filterKeys(outPorts.map(_.name).contains).toMap
  }

  private def runStructural(
      spark: SparkSession,
      ns: Namespace,
      sl: Streamlet,
      impl: StructuralImpl,
      inputs: Map[String, DataFrame],
  ): Map[String, DataFrame] = {
    val resolved: Map[String, (Namespace, Streamlet)] =
      impl.instances.map(i => i.name -> project.resolveStreamlet(ns, i.streamlet).get).toMap

    // Which endpoint of a connection produces data: parent `in` ports and
    // instance `out` ports.
    def isSource(e: Endpoint): Boolean = e match {
      case ParentPort(p)      => sl.interface.port(p).exists(_.direction == In)
      case InstancePort(i, p) => resolved(i)._2.interface.port(p).exists(_.direction == Out)
    }

    // sink endpoint -> source endpoint (validation guarantees one of each).
    val feeds: Map[Endpoint, Endpoint] = impl.connections.map { c =>
      if (isSource(c.a)) (c.b, c.a) else (c.a, c.b)
    }.toMap

    val frames = mutable.Map.empty[Endpoint, DataFrame]
    sl.interface.ports.filter(_.direction == In).foreach { p =>
      frames(ParentPort(p.name)) = inputs(p.name)
    }

    // Run instances as their inputs become available (topological execution;
    // a cycle of unsatisfied instances is an error).
    val pending = mutable.LinkedHashSet.from(impl.instances.map(_.name))
    var progress = true
    while (pending.nonEmpty && progress) {
      progress = false
      for (instName <- pending.toVector) {
        val (instNs, target) = resolved(instName)
        val ins = target.interface.ports.filter(_.direction == In)
        val sources = ins.map { p =>
          val sink = InstancePort(instName, p.name)
          feeds.get(sink).flatMap(frames.get).map(p.name -> _)
        }
        if (sources.forall(_.isDefined)) {
          val instInputs = sources.flatten.toMap
          val instOutputs = run(spark, instNs, target, instInputs)
          instOutputs.foreach { case (port, df) =>
            frames(InstancePort(instName, port)) = df
          }
          pending -= instName
          progress = true
        }
      }
    }
    if (pending.nonEmpty)
      throw ExecutionError(
        s"streamlet ${sl.name}: cyclic or underfed instances: ${pending.mkString(", ")} " +
          "(batch dataflow execution requires an acyclic forward design)")

    sl.interface.ports.filter(_.direction == Out).map { p =>
      val sink = ParentPort(p.name)
      val src  = feeds.getOrElse(sink,
        throw ExecutionError(s"output port ${p.name} has no feeding connection"))
      p.name -> frames.getOrElse(src,
        throw ExecutionError(s"output port ${p.name}: source ${src.show} produced no frame"))
    }.toMap
  }
}
