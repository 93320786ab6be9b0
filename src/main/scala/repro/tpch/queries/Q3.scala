package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q3: three large tables, *all* with local predicates — the paper's
  * example (§4.2) of a short query that still gains 10× because one-hop
  * Bloom join cannot spread every predicate to every table.
  */
object Q3 extends LiteQuery {
  override val name = "Q3"
  override val oracleTableNames = Seq("customer", "orders", "lineitem")

  override def build(t: TpchLite): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("customer",
          t.customer.select("c_custkey", "c_mktsegment"),
          t.estRows("customer"),
          Some(col("c_mktsegment") === "BUILDING")),
        TableRef("orders",
          t.orders.select("o_orderkey", "o_custkey", "o_orderdate"),
          t.estRows("orders"),
          Some(col("o_orderdate") < "1995-03-15")),
        TableRef("lineitem",
          t.lineitem.select("l_orderkey", "l_shipdate", "l_extendedprice", "l_discount"),
          t.estRows("lineitem"),
          Some(col("l_shipdate") > "1995-03-15")),
      ),
      edges = Seq(
        JoinEdge("customer", Seq("c_custkey"), "orders", Seq("o_custkey")),
        JoinEdge("orders", Seq("o_orderkey"), "lineitem", Seq("l_orderkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "orders", "customer"),
      finish = _.groupBy("l_orderkey", "o_orderdate")
        .agg(decSum(revenue).as("revenue"))
        .orderBy(desc("revenue"), col("l_orderkey"))
        .limit(10)
        .select("l_orderkey", "revenue", "o_orderdate"),
    )
  }

  override val oracleSql: String =
    s"""SELECT l_orderkey, $duckRevenueSum AS revenue, o_orderdate
       |FROM customer, orders, lineitem
       |WHERE c_mktsegment = 'BUILDING' AND c_custkey = o_custkey
       |  AND l_orderkey = o_orderkey
       |  AND o_orderdate < '1995-03-15' AND l_shipdate > '1995-03-15'
       |GROUP BY l_orderkey, o_orderdate
       |ORDER BY revenue DESC, CAST(l_orderkey AS BIGINT)
       |LIMIT 10""".stripMargin
}
