package repro.tydi.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.tydi.ir._
import repro.tydi.til.Parser
import repro.tydi.types._

/** The Spark backend end to end: TIL-declared streamlets with kernel links,
  * structurally composed, executed as one Catalyst plan and checked for
  * result equality against DuckDB.
  */
class ExecutorSpec extends SparkSpec {

  // ---- the TPC-H-lite q3lite pipeline (DESIGN.md §Beyond-paper) ----

  test("q3lite: the composed dataflow equals the monolithic SQL on DuckDB (SF=0.01)") {
    val li     = SynthData.lineitem(spark, 0.01).limit(20000).cache()
    val orders = SynthData.orders(spark, 0.01).cache()
    val out = TpchDataflow.execute(spark, li, orders)
    Oracle.assertEquivalent(
      out.select(col("l_orderkey"), col("o_orderdate").cast("string") as "o_orderdate",
        col("revenue")),
      TpchDataflow.oracleSql,
      "lineitem" -> TpchDataflow.lineitemInput(li),
      "orders"   -> TpchDataflow.ordersInput(orders))
  }

  test("q3lite: the composed dataflow equals the hand-fused Spark baseline") {
    val li     = SynthData.lineitem(spark, 0.005)
    val orders = SynthData.orders(spark, 0.005)
    val composed = TpchDataflow.execute(spark, li, orders)
    val fused    = TpchDataflow.monolithic(spark, li, orders)
    assert(composed.exceptAll(fused).isEmpty)
    assert(fused.exceptAll(composed).isEmpty)
  }

  test("the q3lite TIL source validates cleanly") {
    val parsed = Parser.parse(TpchDataflow.tilSource)
    assert(Validate.project(parsed.project).isEmpty)
  }

  // ---- executor mechanics ----

  private val colT = TStream(TGroup("k" -> TBits(64), "v" -> TBits(64)), complexity = 2)

  private def toyProject(topImpl: StructuralImpl): Project = {
    val double = Streamlet("double", Interface.of(
      Port("i", In, colT), Port("o", Out, colT)), Some(LinkedImpl("toy/double")))
    val top = Streamlet("top", Interface.of(
      Port("src", In, colT), Port("dst", Out, colT)), Some(topImpl))
    Project.of(Namespace(Vector("toy"),
      streamlets = Map("double" -> double, "top" -> top)))
  }

  private def toyRegistry = new KernelRegistry().register("toy/double",
    Kernel.transform("i", "o")(df => df.withColumn("v", col("v") * 2)))

  private def toyFrame: DataFrame = {
    import spark.implicits._
    Seq((1L, 10L), (2L, 20L)).toDF("k", "v")
  }

  test("a chain of instances composes kernels in wiring order") {
    val impl = StructuralImpl(
      Vector(Instance("d1", Ref.local("double")), Instance("d2", Ref.local("double"))),
      Vector(
        Connection(ParentPort("src"), InstancePort("d1", "i")),
        Connection(InstancePort("d1", "o"), InstancePort("d2", "i")),
        Connection(InstancePort("d2", "o"), ParentPort("dst"))))
    val exec = new DataflowExecutor(toyProject(impl), toyRegistry)
    val out = exec.execute(spark, Vector("toy"), "top", Map("src" -> toyFrame))("dst")
    assert(out.orderBy("k").collect().map(_.getLong(1)).toVector == Vector(40L, 80L))
  }

  test("instance declaration order does not matter — execution is data-driven") {
    val impl = StructuralImpl(
      Vector(Instance("d2", Ref.local("double")), Instance("d1", Ref.local("double"))),
      Vector(
        Connection(ParentPort("src"), InstancePort("d1", "i")),
        Connection(InstancePort("d1", "o"), InstancePort("d2", "i")),
        Connection(InstancePort("d2", "o"), ParentPort("dst"))))
    val exec = new DataflowExecutor(toyProject(impl), toyRegistry)
    val out = exec.execute(spark, Vector("toy"), "top", Map("src" -> toyFrame))("dst")
    assert(out.orderBy("k").collect().map(_.getLong(1)).toVector == Vector(40L, 80L))
  }

  test("nested structural implementations recurse") {
    val inner = Streamlet("inner", Interface.of(
      Port("a", In, colT), Port("b", Out, colT)),
      Some(StructuralImpl(
        Vector(Instance("d", Ref.local("double"))),
        Vector(
          Connection(ParentPort("a"), InstancePort("d", "i")),
          Connection(InstancePort("d", "o"), ParentPort("b"))))))
    val double = Streamlet("double", Interface.of(
      Port("i", In, colT), Port("o", Out, colT)), Some(LinkedImpl("toy/double")))
    val top = Streamlet("top", Interface.of(
      Port("src", In, colT), Port("dst", Out, colT)),
      Some(StructuralImpl(
        Vector(Instance("n1", Ref.local("inner")), Instance("n2", Ref.local("inner"))),
        Vector(
          Connection(ParentPort("src"), InstancePort("n1", "a")),
          Connection(InstancePort("n1", "b"), InstancePort("n2", "a")),
          Connection(InstancePort("n2", "b"), ParentPort("dst"))))))
    val p = Project.of(Namespace(Vector("toy"), streamlets = Map(
      "double" -> double, "inner" -> inner, "top" -> top)))
    val out = new DataflowExecutor(p, toyRegistry)
      .execute(spark, Vector("toy"), "top", Map("src" -> toyFrame))("dst")
    assert(out.orderBy("k").collect().map(_.getLong(1)).toVector == Vector(40L, 80L))
  }

  test("validation runs before execution: an unconnected port aborts") {
    val impl = StructuralImpl(
      Vector(Instance("d1", Ref.local("double"))),
      Vector(Connection(ParentPort("src"), InstancePort("d1", "i"))))
    val exec = new DataflowExecutor(toyProject(impl), toyRegistry)
    val e = intercept[ExecutionError](
      exec.execute(spark, Vector("toy"), "top", Map("src" -> toyFrame)))
    assert(e.message.contains("unconnected"))
  }

  test("a missing kernel registration is a clear error") {
    val impl = StructuralImpl(
      Vector(Instance("d1", Ref.local("double"))),
      Vector(
        Connection(ParentPort("src"), InstancePort("d1", "i")),
        Connection(InstancePort("d1", "o"), ParentPort("dst"))))
    val exec = new DataflowExecutor(toyProject(impl), new KernelRegistry)
    val e = intercept[ExecutionError](
      exec.execute(spark, Vector("toy"), "top", Map("src" -> toyFrame)))
    assert(e.message.contains("no kernel registered"))
  }

  test("a frame violating the port contract is rejected at the boundary") {
    import spark.implicits._
    val impl = StructuralImpl(
      Vector(Instance("d1", Ref.local("double"))),
      Vector(
        Connection(ParentPort("src"), InstancePort("d1", "i")),
        Connection(InstancePort("d1", "o"), ParentPort("dst"))))
    val exec = new DataflowExecutor(toyProject(impl), toyRegistry)
    val wrong = Seq((1L, 1L)).toDF("k", "wrong")
    val e = intercept[ExecutionError](
      exec.execute(spark, Vector("toy"), "top", Map("src" -> wrong)))
    assert(e.message.contains("port expects columns"))
  }

  test("missing input frames are reported by name") {
    val impl = StructuralImpl(
      Vector(Instance("d1", Ref.local("double"))),
      Vector(
        Connection(ParentPort("src"), InstancePort("d1", "i")),
        Connection(InstancePort("d1", "o"), ParentPort("dst"))))
    val exec = new DataflowExecutor(toyProject(impl), toyRegistry)
    val e = intercept[ExecutionError](
      exec.execute(spark, Vector("toy"), "top", Map.empty))
    assert(e.message.contains("missing input frames for src"))
  }

  test("a streamlet without implementation cannot be executed") {
    val bare = Streamlet("bare", Interface.of(Port("i", In, colT), Port("o", Out, colT)))
    val p = Project.of(Namespace(Vector("toy"), streamlets = Map("bare" -> bare)))
    val e = intercept[ExecutionError](
      new DataflowExecutor(p, toyRegistry)
        .execute(spark, Vector("toy"), "bare", Map("i" -> toyFrame)))
    assert(e.message.contains("no implementation"))
  }

  test("substitution changes the executed behavior without touching the wiring (§6.2)") {
    import repro.tydi.spec.Substitute
    val impl = StructuralImpl(
      Vector(Instance("d1", Ref.local("double"))),
      Vector(
        Connection(ParentPort("src"), InstancePort("d1", "i")),
        Connection(InstancePort("d1", "o"), ParentPort("dst"))))
    val project = toyProject(impl)
    val mock = Streamlet("double_mock", Interface.of(
      Port("i", In, colT), Port("o", Out, colT)), Some(LinkedImpl("toy/identity")))
    val substituted = Substitute.impl(project, Ref(Vector("toy"), "double"), mock)
    val registry = toyRegistry.register("toy/identity",
      Kernel.transform("i", "o")(identity))
    val out = new DataflowExecutor(substituted, registry)
      .execute(spark, Vector("toy"), "top", Map("src" -> toyFrame))("dst")
    assert(out.orderBy("k").collect().map(_.getLong(1)).toVector == Vector(10L, 20L))
  }
}
