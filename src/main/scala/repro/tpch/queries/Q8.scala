package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q8 (lite): eight tables — the widest join graph in the suite —
  * with selective predicates on part and region that must travel several
  * hops to reach lineitem/orders.
  */
object Q8 extends LiteQuery {
  override val name = "Q8"
  override val oracleTableNames =
    Seq("part", "supplier", "lineitem", "orders", "customer", "nation", "region")

  override def build(t: TpchLite): JoinQuery = {
    val n1 = t.nation.select(
      col("n_nationkey").as("n1_nationkey"), col("n_regionkey").as("n1_regionkey"))
    val n2 = t.nation.select(
      col("n_nationkey").as("n2_nationkey"), col("n_name").as("n2_name"))
    val graph = JoinGraph(
      tables = Seq(
        TableRef("part", t.part.select("p_partkey", "p_type"), t.estRows("part"),
          Some(col("p_type") === "ECONOMY")),
        TableRef("lineitem",
          t.lineitem.select("l_orderkey", "l_partkey", "l_suppkey",
            "l_extendedprice", "l_discount"),
          t.estRows("lineitem")),
        TableRef("supplier", t.supplier.select("s_suppkey", "s_nationkey"),
          t.estRows("supplier")),
        TableRef("orders", t.orders.select("o_orderkey", "o_custkey", "o_orderdate"),
          t.estRows("orders"),
          Some(col("o_orderdate").between("1995-01-01", "1996-12-31"))),
        TableRef("customer", t.customer.select("c_custkey", "c_nationkey"),
          t.estRows("customer")),
        TableRef("n1", n1, t.estRows("nation")),
        TableRef("region", t.region.select("r_regionkey", "r_name"),
          t.estRows("region"), Some(col("r_name") === "AMERICA")),
        TableRef("n2", n2, t.estRows("nation")),
      ),
      edges = Seq(
        JoinEdge("part", Seq("p_partkey"), "lineitem", Seq("l_partkey")),
        JoinEdge("supplier", Seq("s_suppkey"), "lineitem", Seq("l_suppkey")),
        JoinEdge("lineitem", Seq("l_orderkey"), "orders", Seq("o_orderkey")),
        JoinEdge("orders", Seq("o_custkey"), "customer", Seq("c_custkey")),
        JoinEdge("customer", Seq("c_nationkey"), "n1", Seq("n1_nationkey")),
        JoinEdge("n1", Seq("n1_regionkey"), "region", Seq("r_regionkey")),
        JoinEdge("supplier", Seq("s_nationkey"), "n2", Seq("n2_nationkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "part", "supplier", "orders",
                      "customer", "n1", "region", "n2"),
      finish = _.groupBy(year(col("o_orderdate")).as("o_year"))
        .agg((decSum(when(col("n2_name") === "BRAZIL", revenue).otherwise(lit(0)))
                .cast("double") /
              decSum(revenue).cast("double")).as("mkt_share")),
    )
  }

  override val oracleSql: String =
    """SELECT substr(o_orderdate, 1, 4) AS o_year,
      |  CAST(SUM(CASE WHEN n2.n_name = 'BRAZIL'
      |    THEN CAST(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)) AS DECIMAL(18,4))
      |    ELSE CAST(0 AS DECIMAL(18,4)) END) AS DOUBLE)
      |  / CAST(SUM(CAST(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)) AS DECIMAL(18,4))) AS DOUBLE)
      |  AS mkt_share
      |FROM part, lineitem, supplier, orders, customer, nation n1, region, nation n2
      |WHERE p_partkey = l_partkey AND s_suppkey = l_suppkey
      |  AND o_orderkey = l_orderkey AND c_custkey = o_custkey
      |  AND c_nationkey = n1.n_nationkey AND n1.n_regionkey = r_regionkey
      |  AND r_name = 'AMERICA' AND s_nationkey = n2.n_nationkey
      |  AND p_type = 'ECONOMY'
      |  AND o_orderdate BETWEEN '1995-01-01' AND '1996-12-31'
      |GROUP BY 1""".stripMargin
}
