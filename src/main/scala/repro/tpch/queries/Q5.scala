package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q5 — the paper's running example (Figure 1, Table 1): six tables,
  * a *cyclic* join graph (customer–orders–lineitem–supplier–customer via
  * `c_nationkey = s_nationkey`), local predicates on region and orders.
  *
  * The default join order `lineitem → supplier → orders → customer → nation
  * → region` reproduces the paper's Table 1 No-Pred-Trans column (HT
  * 10K/228K/150K/25/1, PR 6M/6M/910K/36K/36K at SF1).
  */
object Q5 extends LiteQuery {
  override val name = "Q5"
  override val oracleTableNames =
    Seq("customer", "orders", "lineitem", "supplier", "nation", "region")

  override def build(t: TpchLite): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("lineitem",
          t.lineitem.select("l_orderkey", "l_suppkey", "l_extendedprice", "l_discount"),
          t.estRows("lineitem")),
        TableRef("orders",
          t.orders.select("o_orderkey", "o_custkey", "o_orderdate"),
          t.estRows("orders"),
          Some(col("o_orderdate") >= "1994-01-01" && col("o_orderdate") < "1995-01-01")),
        TableRef("customer",
          t.customer.select("c_custkey", "c_nationkey"),
          t.estRows("customer")),
        TableRef("supplier",
          t.supplier.select("s_suppkey", "s_nationkey"),
          t.estRows("supplier")),
        TableRef("nation",
          t.nation.select("n_nationkey", "n_regionkey", "n_name"),
          t.estRows("nation")),
        TableRef("region",
          t.region.select("r_regionkey", "r_name"),
          t.estRows("region"),
          Some(col("r_name") === "ASIA")),
      ),
      edges = Seq(
        JoinEdge("lineitem", Seq("l_orderkey"), "orders", Seq("o_orderkey")),
        JoinEdge("orders", Seq("o_custkey"), "customer", Seq("c_custkey")),
        JoinEdge("lineitem", Seq("l_suppkey"), "supplier", Seq("s_suppkey")),
        JoinEdge("customer", Seq("c_nationkey"), "supplier", Seq("s_nationkey")),
        JoinEdge("supplier", Seq("s_nationkey"), "nation", Seq("n_nationkey")),
        JoinEdge("nation", Seq("n_regionkey"), "region", Seq("r_regionkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "supplier", "orders", "customer", "nation", "region"),
      finish = _.groupBy("n_name").agg(decSum(revenue).as("revenue")),
    )
  }

  override val oracleSql: String =
    s"""SELECT n_name, $duckRevenueSum AS revenue
       |FROM customer, orders, lineitem, supplier, nation, region
       |WHERE c_custkey = o_custkey AND l_orderkey = o_orderkey
       |  AND l_suppkey = s_suppkey AND c_nationkey = s_nationkey
       |  AND s_nationkey = n_nationkey AND n_regionkey = r_regionkey
       |  AND r_name = 'ASIA'
       |  AND o_orderdate >= '1994-01-01' AND o_orderdate < '1995-01-01'
       |GROUP BY n_name""".stripMargin
}
