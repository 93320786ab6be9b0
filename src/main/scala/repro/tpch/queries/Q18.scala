package repro.tpch.queries

import org.apache.spark.sql.functions._
import org.apache.spark.sql.DataFrame
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q18 (lite): large-volume orders. The `HAVING SUM(l_quantity) > 180`
  * subquery becomes a tiny key table that transfers its (very selective)
  * predicate to orders, lineitem and customer — another query where the fact
  * table appears in both the main query and the subquery.
  */
object Q18 extends LiteQuery {
  override val name = "Q18"
  override val oracleTableNames = Seq("customer", "orders", "lineitem")

  /** ~1% of orders exceed total quantity 300: lines/order is ~Poisson(4)
    * with ~26 avg quantity per line, so 300 needs ≥ ~12 lines — the same
    * "rare huge order" selectivity the original query targets.
    */
  val QtyThreshold = 300

  def bigOrders(t: TpchLite): DataFrame =
    t.lineitem.groupBy("l_orderkey")
      .agg(sum(col("l_quantity").cast("decimal(18,6)")).as("__qty"))
      .filter(col("__qty") > QtyThreshold)
      .select(col("l_orderkey").as("bo_orderkey"))

  def mainQuery(t: TpchLite, big: DataFrame): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("customer", t.customer.select("c_custkey"), t.estRows("customer")),
        TableRef("orders",
          t.orders.select("o_orderkey", "o_custkey", "o_orderdate", "o_totalprice"),
          t.estRows("orders")),
        TableRef("lineitem", t.lineitem.select("l_orderkey", "l_quantity"),
          t.estRows("lineitem")),
        // Catalog-style guess: the HAVING filter is very selective.
        TableRef("bigorders", big, math.max(1L, t.estRows("orders") / 100)),
      ),
      edges = Seq(
        JoinEdge("customer", Seq("c_custkey"), "orders", Seq("o_custkey")),
        JoinEdge("orders", Seq("o_orderkey"), "lineitem", Seq("l_orderkey")),
        JoinEdge("orders", Seq("o_orderkey"), "bigorders", Seq("bo_orderkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "orders", "bigorders", "customer"),
      finish = _.groupBy("c_custkey", "o_orderkey", "o_orderdate", "o_totalprice")
        .agg(sum(col("l_quantity").cast("decimal(18,6)")).as("total_qty"))
        .orderBy(desc("o_totalprice"), col("o_orderdate"), col("o_orderkey"))
        .limit(100),
    )
  }

  override def build(t: TpchLite): JoinQuery = mainQuery(t, bigOrders(t))

  override def execute(t: TpchLite, strategy: Strategy, opts: ExecOpts,
                       metrics: Option[ExecMetrics]): DataFrame =
    Executor.execute(
      mainQuery(t, materializeIf(bigOrders(t), opts, metrics)),
      strategy, opts, metrics)

  override val oracleSql: String =
    s"""SELECT c_custkey, o_orderkey, o_orderdate,
       |  CAST(o_totalprice AS DOUBLE) AS o_totalprice,
       |  SUM(CAST(l_quantity AS DECIMAL(18,6))) AS total_qty
       |FROM customer, orders, lineitem
       |WHERE o_orderkey IN (
       |    SELECT l_orderkey FROM lineitem
       |    GROUP BY l_orderkey
       |    HAVING SUM(CAST(l_quantity AS DECIMAL(18,6))) > $QtyThreshold)
       |  AND c_custkey = o_custkey AND o_orderkey = l_orderkey
       |GROUP BY 1, 2, 3, 4
       |ORDER BY CAST(o_totalprice AS DOUBLE) DESC, o_orderdate, CAST(o_orderkey AS BIGINT)
       |LIMIT 100""".stripMargin
}
