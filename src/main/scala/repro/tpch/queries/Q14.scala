package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q14 (lite): promo revenue ratio — two tables, single scalar row. */
object Q14 extends LiteQuery {
  override val name = "Q14"
  override val oracleTableNames = Seq("lineitem", "part")

  override def build(t: TpchLite): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("lineitem",
          t.lineitem.select("l_partkey", "l_shipdate", "l_extendedprice", "l_discount"),
          t.estRows("lineitem"),
          Some(col("l_shipdate") >= "1995-09-01" && col("l_shipdate") < "1995-10-01")),
        TableRef("part", t.part.select("p_partkey", "p_type"), t.estRows("part")),
      ),
      edges = Seq(
        JoinEdge("lineitem", Seq("l_partkey"), "part", Seq("p_partkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "part"),
      finish = _.agg(
        (decSum(when(col("p_type") === "PROMO", revenue).otherwise(lit(0)))
           .cast("double") * 100 /
         decSum(revenue).cast("double")).as("promo_revenue")),
    )
  }

  override val oracleSql: String =
    """SELECT CAST(SUM(CASE WHEN p_type = 'PROMO'
      |    THEN CAST(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)) AS DECIMAL(18,4))
      |    ELSE CAST(0 AS DECIMAL(18,4)) END) AS DOUBLE) * 100
      |  / CAST(SUM(CAST(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)) AS DECIMAL(18,4))) AS DOUBLE)
      |  AS promo_revenue
      |FROM lineitem, part
      |WHERE l_partkey = p_partkey
      |  AND l_shipdate >= '1995-09-01' AND l_shipdate < '1995-10-01'""".stripMargin
}
