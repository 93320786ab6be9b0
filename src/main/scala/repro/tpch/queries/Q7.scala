package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q7 (lite): self-join of nation (supplier nation vs customer
  * nation) with a cross-table disjunction on the nation pair — the pair
  * predicate stays a post-join filter, but the per-copy
  * `IN ('FRANCE','GERMANY')` filters still transfer.
  */
object Q7 extends LiteQuery {
  override val name = "Q7"
  override val oracleTableNames = Seq("supplier", "lineitem", "orders", "customer", "nation")

  override def build(t: TpchLite): JoinQuery = {
    val n1 = t.nation.select(
      col("n_nationkey").as("n1_nationkey"), col("n_name").as("n1_name"))
    val n2 = t.nation.select(
      col("n_nationkey").as("n2_nationkey"), col("n_name").as("n2_name"))
    val graph = JoinGraph(
      tables = Seq(
        TableRef("supplier", t.supplier.select("s_suppkey", "s_nationkey"),
          t.estRows("supplier")),
        TableRef("lineitem",
          t.lineitem.select("l_orderkey", "l_suppkey", "l_shipdate",
            "l_extendedprice", "l_discount"),
          t.estRows("lineitem"),
          Some(col("l_shipdate").between("1995-01-01", "1996-12-31"))),
        TableRef("orders", t.orders.select("o_orderkey", "o_custkey"),
          t.estRows("orders")),
        TableRef("customer", t.customer.select("c_custkey", "c_nationkey"),
          t.estRows("customer")),
        TableRef("n1", n1, t.estRows("nation"),
          Some(col("n1_name").isin("FRANCE", "GERMANY"))),
        TableRef("n2", n2, t.estRows("nation"),
          Some(col("n2_name").isin("FRANCE", "GERMANY"))),
      ),
      edges = Seq(
        JoinEdge("supplier", Seq("s_suppkey"), "lineitem", Seq("l_suppkey")),
        JoinEdge("lineitem", Seq("l_orderkey"), "orders", Seq("o_orderkey")),
        JoinEdge("orders", Seq("o_custkey"), "customer", Seq("c_custkey")),
        JoinEdge("supplier", Seq("s_nationkey"), "n1", Seq("n1_nationkey")),
        JoinEdge("customer", Seq("c_nationkey"), "n2", Seq("n2_nationkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "supplier", "orders", "customer", "n1", "n2"),
      postJoinFilter = Some(
        (col("n1_name") === "FRANCE" && col("n2_name") === "GERMANY") ||
        (col("n1_name") === "GERMANY" && col("n2_name") === "FRANCE")),
      finish = _.groupBy(
          col("n1_name").as("supp_nation"),
          col("n2_name").as("cust_nation"),
          year(col("l_shipdate")).as("l_year"))
        .agg(decSum(revenue).as("revenue")),
    )
  }

  override val oracleSql: String =
    s"""SELECT n1.n_name AS supp_nation, n2.n_name AS cust_nation,
       |       substr(l_shipdate, 1, 4) AS l_year, $duckRevenueSum AS revenue
       |FROM supplier, lineitem, orders, customer, nation n1, nation n2
       |WHERE s_suppkey = l_suppkey AND o_orderkey = l_orderkey
       |  AND c_custkey = o_custkey AND s_nationkey = n1.n_nationkey
       |  AND c_nationkey = n2.n_nationkey
       |  AND ((n1.n_name = 'FRANCE' AND n2.n_name = 'GERMANY')
       |    OR (n1.n_name = 'GERMANY' AND n2.n_name = 'FRANCE'))
       |  AND l_shipdate BETWEEN '1995-01-01' AND '1996-12-31'
       |GROUP BY 1, 2, 3""".stripMargin
}
