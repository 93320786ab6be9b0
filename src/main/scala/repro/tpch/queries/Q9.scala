package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._

/** TPC-H Q9 (lite): profit per nation/year. Exercises the composite-key
  * edge lineitem ↔ partsupp on `(partkey, suppkey)` — one transfer edge
  * carrying a two-column key.
  */
object Q9 extends LiteQuery {
  override val name = "Q9"
  override val oracleTableNames =
    Seq("part", "supplier", "lineitem", "partsupp", "orders", "nation")

  override def build(t: TpchLite): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("part", t.part.select("p_partkey", "p_type"), t.estRows("part"),
          Some(col("p_type") === "PROMO")),
        TableRef("supplier", t.supplier.select("s_suppkey", "s_nationkey"),
          t.estRows("supplier")),
        TableRef("lineitem",
          t.lineitem.select("l_orderkey", "l_partkey", "l_suppkey",
            "l_quantity", "l_extendedprice", "l_discount"),
          t.estRows("lineitem")),
        TableRef("partsupp",
          t.partsupp.select("ps_partkey", "ps_suppkey", "ps_supplycost"),
          t.estRows("partsupp")),
        TableRef("orders", t.orders.select("o_orderkey", "o_orderdate"),
          t.estRows("orders")),
        TableRef("nation", t.nation.select("n_nationkey", "n_name"),
          t.estRows("nation")),
      ),
      edges = Seq(
        JoinEdge("part", Seq("p_partkey"), "lineitem", Seq("l_partkey")),
        JoinEdge("supplier", Seq("s_suppkey"), "lineitem", Seq("l_suppkey")),
        JoinEdge("partsupp", Seq("ps_partkey", "ps_suppkey"),
                 "lineitem", Seq("l_partkey", "l_suppkey")),
        JoinEdge("orders", Seq("o_orderkey"), "lineitem", Seq("l_orderkey")),
        JoinEdge("supplier", Seq("s_nationkey"), "nation", Seq("n_nationkey")),
      ),
    )
    val amount = col("l_extendedprice") * (lit(1) - col("l_discount")) -
      col("ps_supplycost") * col("l_quantity")
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "part", "partsupp", "supplier", "orders", "nation"),
      finish = _.groupBy(col("n_name"), year(col("o_orderdate")).as("o_year"))
        .agg(LiteQuery.decSum(amount).as("sum_profit")),
    )
  }

  override val oracleSql: String =
    """SELECT n_name, substr(o_orderdate, 1, 4) AS o_year,
      |  SUM(CAST(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))
      |           - CAST(ps_supplycost AS DOUBLE) * CAST(l_quantity AS DOUBLE)
      |      AS DECIMAL(18,4))) AS sum_profit
      |FROM part, supplier, lineitem, partsupp, orders, nation
      |WHERE s_suppkey = l_suppkey AND ps_suppkey = l_suppkey
      |  AND ps_partkey = l_partkey AND p_partkey = l_partkey
      |  AND o_orderkey = l_orderkey AND s_nationkey = n_nationkey
      |  AND p_type = 'PROMO'
      |GROUP BY 1, 2""".stripMargin
}
