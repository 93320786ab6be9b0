package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q10 (lite): returned-item revenue per customer, top 20. */
object Q10 extends LiteQuery {
  override val name = "Q10"
  override val oracleTableNames = Seq("customer", "orders", "lineitem", "nation")

  override def build(t: TpchLite): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("customer", t.customer.select("c_custkey", "c_nationkey", "c_acctbal"),
          t.estRows("customer")),
        TableRef("orders", t.orders.select("o_orderkey", "o_custkey", "o_orderdate"),
          t.estRows("orders"),
          Some(col("o_orderdate") >= "1993-10-01" && col("o_orderdate") < "1994-01-01")),
        TableRef("lineitem",
          t.lineitem.select("l_orderkey", "l_returnflag", "l_extendedprice", "l_discount"),
          t.estRows("lineitem"),
          Some(col("l_returnflag") === "R")),
        TableRef("nation", t.nation.select("n_nationkey", "n_name"),
          t.estRows("nation")),
      ),
      edges = Seq(
        JoinEdge("customer", Seq("c_custkey"), "orders", Seq("o_custkey")),
        JoinEdge("orders", Seq("o_orderkey"), "lineitem", Seq("l_orderkey")),
        JoinEdge("customer", Seq("c_nationkey"), "nation", Seq("n_nationkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "orders", "customer", "nation"),
      finish = _.groupBy("c_custkey", "n_name")
        .agg(decSum(revenue).as("revenue"))
        .orderBy(desc("revenue"), col("c_custkey"))
        .limit(20),
    )
  }

  override val oracleSql: String =
    s"""SELECT c_custkey, n_name, $duckRevenueSum AS revenue
       |FROM customer, orders, lineitem, nation
       |WHERE c_custkey = o_custkey AND l_orderkey = o_orderkey
       |  AND o_orderdate >= '1993-10-01' AND o_orderdate < '1994-01-01'
       |  AND l_returnflag = 'R' AND c_nationkey = n_nationkey
       |GROUP BY 1, 2
       |ORDER BY revenue DESC, CAST(c_custkey AS BIGINT)
       |LIMIT 20""".stripMargin
}
