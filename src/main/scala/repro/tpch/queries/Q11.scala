package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q11 (lite): the query where the paper observes Yannakakis losing to
  * Bloom join by 12× (bad root ⇒ large hash tables in the semi-join phase).
  * The global-total HAVING threshold is computed in the finalizer from the
  * same joined input, matching the scalar subquery of the original.
  */
object Q11 extends LiteQuery {
  override val name = "Q11"
  override val oracleTableNames = Seq("partsupp", "supplier", "nation")

  private val valueExpr = col("ps_supplycost") * col("ps_availqty")

  override def build(t: TpchLite): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("partsupp",
          t.partsupp.select("ps_partkey", "ps_suppkey", "ps_supplycost", "ps_availqty"),
          t.estRows("partsupp")),
        TableRef("supplier", t.supplier.select("s_suppkey", "s_nationkey"),
          t.estRows("supplier")),
        TableRef("nation", t.nation.select("n_nationkey", "n_name"),
          t.estRows("nation"), Some(col("n_name") === "GERMANY")),
      ),
      edges = Seq(
        JoinEdge("partsupp", Seq("ps_suppkey"), "supplier", Seq("s_suppkey")),
        JoinEdge("supplier", Seq("s_nationkey"), "nation", Seq("n_nationkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("partsupp", "supplier", "nation"),
      finish = { joined =>
        val grouped = joined.groupBy("ps_partkey")
          .agg(decSum(valueExpr).as("value"))
        val total = joined.agg(
          (decSum(valueExpr).cast("double") * 0.0001).as("__threshold"))
        grouped.crossJoin(total)
          .filter(col("value").cast("double") > col("__threshold"))
          .select("ps_partkey", "value")
      },
    )
  }

  override val oracleSql: String =
    """SELECT ps_partkey,
      |  SUM(CAST(CAST(ps_supplycost AS DOUBLE) * CAST(ps_availqty AS INT) AS DECIMAL(18,4))) AS value
      |FROM partsupp, supplier, nation
      |WHERE ps_suppkey = s_suppkey AND s_nationkey = n_nationkey
      |  AND n_name = 'GERMANY'
      |GROUP BY ps_partkey
      |HAVING CAST(SUM(CAST(CAST(ps_supplycost AS DOUBLE) * CAST(ps_availqty AS INT) AS DECIMAL(18,4))) AS DOUBLE)
      |  > (SELECT CAST(SUM(CAST(CAST(ps_supplycost AS DOUBLE) * CAST(ps_availqty AS INT) AS DECIMAL(18,4))) AS DOUBLE) * 0.0001
      |     FROM partsupp, supplier, nation
      |     WHERE ps_suppkey = s_suppkey AND s_nationkey = n_nationkey
      |       AND n_name = 'GERMANY')""".stripMargin
}
