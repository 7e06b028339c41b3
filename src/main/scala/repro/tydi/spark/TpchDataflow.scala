package repro.tydi.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.tydi.til.Parser

/** A TPC-H-lite streaming dataflow expressed in the IR: Streamlets with
  * Tydi-typed ports, linked to Spark kernels, composed structurally into a
  * Q3-like pipeline (filter -> join -> aggregate). This is the repro's
  * `distributed_dataflow` mapping of the paper: an intermediate
  * representation whose typed streaming components lower onto Structured
  * DataFrame operator composition.
  *
  * The dataflow is *declared in TIL* (parsed at runtime by this module), so
  * the whole toolchain — grammar, parser, query system, validation,
  * execution — is exercised end to end on actual data.
  */
object TpchDataflow {

  /** The pipeline's TIL declaration. Column names are the Group field names;
    * 64-bit lanes stand in for the scalar SQL types (see
    * [[SparkTypes.validateFrame]] for the contract the executor enforces).
    */
  val tilSource: String =
    """namespace repro::tpch {
      |type lineitem_t = Stream (
      |    data: Group (
      |        l_orderkey: Bits(64),
      |        l_extendedprice: Bits(64),
      |        l_discount: Bits(64),
      |        l_shipdate: Bits(64),
      |    ),
      |    throughput: 8.0,
      |    complexity: 2,
      |);
      |type orders_t = Stream (
      |    data: Group (
      |        o_orderkey: Bits(64),
      |        o_custkey: Bits(64),
      |        o_orderdate: Bits(64),
      |    ),
      |    throughput: 8.0,
      |    complexity: 2,
      |);
      |type joined_t = Stream (
      |    data: Group (
      |        l_orderkey: Bits(64),
      |        l_extendedprice: Bits(64),
      |        l_discount: Bits(64),
      |        o_orderdate: Bits(64),
      |    ),
      |    throughput: 8.0,
      |    complexity: 2,
      |);
      |type revenue_t = Stream (
      |    data: Group (
      |        l_orderkey: Bits(64),
      |        o_orderdate: Bits(64),
      |        revenue: Bits(64),
      |    ),
      |    throughput: 8.0,
      |    complexity: 2,
      |);
      |#Filters lineitem rows shipped after the cutoff date#
      |streamlet filter_lineitem = (
      |    in_lineitem: in lineitem_t,
      |    out_lineitem: out lineitem_t,
      |) { "spark/tpch/filter_lineitem" };
      |#Joins filtered lineitems with their orders#
      |streamlet join_orders = (
      |    in_lineitem: in lineitem_t,
      |    in_orders: in orders_t,
      |    out_joined: out joined_t,
      |) { "spark/tpch/join_orders" };
      |#Aggregates revenue per order and order date#
      |streamlet aggregate_revenue = (
      |    in_joined: in joined_t,
      |    out_revenue: out revenue_t,
      |) { "spark/tpch/aggregate_revenue" };
      |#Q3-lite: revenue of lineitems shipped after the cutoff, per order#
      |streamlet q3lite = (
      |    lineitem: in lineitem_t,
      |    orders: in orders_t,
      |    revenue: out revenue_t,
      |) {
      |    flt = filter_lineitem;
      |    jn = join_orders;
      |    agg = aggregate_revenue;
      |    lineitem -- flt.in_lineitem;
      |    flt.out_lineitem -- jn.in_lineitem;
      |    orders -- jn.in_orders;
      |    jn.out_joined -- agg.in_joined;
      |    agg.out_revenue -- revenue;
      |};
      |}
      |""".stripMargin

  val cutoffDate = "1995-03-15"

  /** Kernels for the linked implementations above — plain DataFrame
    * transformations, valid in batch and (where the operators allow)
    * streaming execution.
    */
  def registry: KernelRegistry = new KernelRegistry()
    .register("spark/tpch/filter_lineitem",
      Kernel.transform("in_lineitem", "out_lineitem")(
        _.filter(col("l_shipdate") > lit(cutoffDate))))
    .register("spark/tpch/join_orders",
      Kernel.of { (_, inputs) =>
        val joined = inputs("in_lineitem")
          .join(inputs("in_orders"), col("l_orderkey") === col("o_orderkey"))
          .select("l_orderkey", "l_extendedprice", "l_discount", "o_orderdate")
        Map("out_joined" -> joined)
      })
    .register("spark/tpch/aggregate_revenue",
      Kernel.transform("in_joined", "out_revenue")(
        _.groupBy("l_orderkey", "o_orderdate")
          .agg(sum(col("l_extendedprice") * (lit(1.0) - col("l_discount"))).as("revenue"))))

  /** Project SynthData frames onto the ports' column contracts. */
  def lineitemInput(df: DataFrame): DataFrame =
    df.select("l_orderkey", "l_extendedprice", "l_discount", "l_shipdate")
  def ordersInput(df: DataFrame): DataFrame =
    df.select("o_orderkey", "o_custkey", "o_orderdate")

  /** Execute the composed q3lite dataflow. */
  def execute(spark: SparkSession, lineitem: DataFrame, orders: DataFrame): DataFrame = {
    val parsed   = Parser.parse(tilSource)
    val executor = new DataflowExecutor(parsed.project, registry)
    executor.execute(spark, Vector("repro", "tpch"), "q3lite",
      Map("lineitem" -> lineitemInput(lineitem), "orders" -> ordersInput(orders)))("revenue")
  }

  /** The monolithic equivalent, for the DuckDB oracle (input tables are
    * staged as VARCHAR, hence the casts; ISO dates compare correctly as
    * strings).
    */
  val oracleSql: String =
    s"""SELECT l_orderkey, o_orderdate,
       |       SUM(CAST(l_extendedprice AS DOUBLE) * (1.0 - CAST(l_discount AS DOUBLE))) AS revenue
       |FROM lineitem JOIN orders ON lineitem.l_orderkey = orders.o_orderkey
       |WHERE l_shipdate > '$cutoffDate'
       |GROUP BY l_orderkey, o_orderdate
       |""".stripMargin

  /** The same query as one Spark SQL statement (the "hand-fused" baseline a
    * composed IR design is compared against in the bench).
    */
  def monolithic(spark: SparkSession, lineitem: DataFrame, orders: DataFrame): DataFrame =
    lineitemInput(lineitem)
      .filter(col("l_shipdate") > lit(cutoffDate))
      .join(ordersInput(orders), col("l_orderkey") === col("o_orderkey"))
      .groupBy("l_orderkey", "o_orderdate")
      .agg(sum(col("l_extendedprice") * (lit(1.0) - col("l_discount"))).as("revenue"))
}
