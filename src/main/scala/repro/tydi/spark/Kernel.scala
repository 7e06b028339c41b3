package repro.tydi.spark

import scala.collection.concurrent.TrieMap
import org.apache.spark.sql.{DataFrame, SparkSession}

/** A behavioral implementation of a Streamlet on the Spark backend: a typed
  * dataflow operator mapping the DataFrames on the input ports to DataFrames
  * on the output ports.
  *
  * This is the Spark equivalent of the paper's *linked implementations*
  * (§5.2): the IR deliberately cannot express behavior; a `LinkedImpl`'s
  * path is resolved by the backend — the VHDL backend looks for `.vhd`
  * files, the Spark backend looks up this registry. Kernels must restrict
  * themselves to DataFrame/Dataset transformations so the composed pipeline
  * stays a single Catalyst plan (and remains valid under Structured
  * Streaming where the operators allow it).
  */
trait Kernel {
  def apply(spark: SparkSession, inputs: Map[String, DataFrame]): Map[String, DataFrame]
}

object Kernel {
  /** A 1-in/1-out kernel from a plain DataFrame transformation. */
  def transform(in: String, out: String)(f: DataFrame => DataFrame): Kernel =
    (_: SparkSession, inputs: Map[String, DataFrame]) => Map(out -> f(inputs(in)))

  def of(f: (SparkSession, Map[String, DataFrame]) => Map[String, DataFrame]): Kernel =
    (spark: SparkSession, inputs: Map[String, DataFrame]) => f(spark, inputs)
}

/** Resolves linked-implementation paths to kernels. Multiple registries can
  * coexist (e.g. a test registry substituting mocks, paper §6.2).
  */
final class KernelRegistry {
  private val kernels = TrieMap.empty[String, Kernel]

  def register(path: String, kernel: Kernel): this.type = {
    kernels(path) = kernel; this
  }

  def resolve(path: String): Option[Kernel] = kernels.get(path)

  def paths: Vector[String] = kernels.keys.toVector.sorted
}
