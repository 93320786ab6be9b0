package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._

/** TPC-H Q12 (lite): a two-table query — the class the paper notes benefits
  * little from multi-hop transfer (one hop already spreads every predicate).
  */
object Q12 extends LiteQuery {
  override val name = "Q12"
  override val oracleTableNames = Seq("orders", "lineitem")

  override def build(t: TpchLite): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("orders", t.orders.select("o_orderkey", "o_orderstatus"),
          t.estRows("orders")),
        TableRef("lineitem",
          t.lineitem.select("l_orderkey", "l_shipmode", "l_shipdate",
            "l_commitdate", "l_receiptdate"),
          t.estRows("lineitem"),
          Some(col("l_shipmode").isin("MAIL", "SHIP") &&
            col("l_commitdate") < col("l_receiptdate") &&
            col("l_shipdate") < col("l_commitdate") &&
            col("l_receiptdate") >= "1994-01-01" &&
            col("l_receiptdate") < "1995-01-01")),
      ),
      edges = Seq(
        JoinEdge("orders", Seq("o_orderkey"), "lineitem", Seq("l_orderkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "orders"),
      finish = _.groupBy("l_shipmode").agg(
        sum(when(col("o_orderstatus") === "F", 1L).otherwise(0L)).as("high_count"),
        sum(when(col("o_orderstatus") =!= "F", 1L).otherwise(0L)).as("low_count")),
    )
  }

  override val oracleSql: String =
    """SELECT l_shipmode,
      |  SUM(CASE WHEN o_orderstatus = 'F' THEN 1 ELSE 0 END) AS high_count,
      |  SUM(CASE WHEN o_orderstatus <> 'F' THEN 1 ELSE 0 END) AS low_count
      |FROM orders, lineitem
      |WHERE o_orderkey = l_orderkey
      |  AND l_shipmode IN ('MAIL', 'SHIP')
      |  AND l_commitdate < l_receiptdate AND l_shipdate < l_commitdate
      |  AND l_receiptdate >= '1994-01-01' AND l_receiptdate < '1995-01-01'
      |GROUP BY l_shipmode""".stripMargin
}
