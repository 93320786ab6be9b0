package repro.tpch.queries

import org.apache.spark.sql.functions._
import org.apache.spark.sql.DataFrame
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q17 (lite): small-quantity-order revenue. The correlated
  * `0.2 * avg(l_quantity)` subquery is decorrelated into a per-part
  * threshold table (a single-table aggregation, executed before the
  * transfer phase per §3.4); lineitem appears in both the main query and
  * the subquery — the paper's explanation for Q17's large speedup, since
  * only global transfer reaches both.
  */
object Q17 extends LiteQuery {
  override val name = "Q17"
  override val oracleTableNames = Seq("lineitem", "part")

  /** Per-part quantity threshold, exact-deterministic on both engines. */
  def thresholds(t: TpchLite): DataFrame =
    t.lineitem.groupBy("l_partkey")
      .agg(((sum(col("l_quantity").cast("decimal(18,6)")).cast("double") /
             count(lit(1))) * 0.2).as("qt_threshold"))
      .select(col("l_partkey").as("qt_partkey"), col("qt_threshold"))

  def mainQuery(t: TpchLite, qt: DataFrame): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("part", t.part.select("p_partkey", "p_brand", "p_container"),
          t.estRows("part"),
          Some(col("p_brand") === "Brand#23" && col("p_container") === "MED BOX")),
        TableRef("lineitem",
          t.lineitem.select("l_partkey", "l_quantity", "l_extendedprice"),
          t.estRows("lineitem")),
        TableRef("qthresh", qt, t.estRows("part")),
      ),
      edges = Seq(
        JoinEdge("part", Seq("p_partkey"), "lineitem", Seq("l_partkey")),
        JoinEdge("lineitem", Seq("l_partkey"), "qthresh", Seq("qt_partkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "part", "qthresh"),
      postJoinFilter = Some(col("l_quantity") < col("qt_threshold")),
      finish = _.agg(
        (decSum(col("l_extendedprice")).cast("double") / 7.0).as("avg_yearly")),
    )
  }

  override def build(t: TpchLite): JoinQuery = mainQuery(t, thresholds(t))

  override def execute(t: TpchLite, strategy: Strategy, opts: ExecOpts,
                       metrics: Option[ExecMetrics]): DataFrame =
    Executor.execute(
      mainQuery(t, materializeIf(thresholds(t), opts, metrics)),
      strategy, opts, metrics)

  override val oracleSql: String =
    """SELECT CAST(SUM(CAST(l_extendedprice AS DECIMAL(18,4))) AS DOUBLE) / 7.0 AS avg_yearly
      |FROM lineitem, part
      |WHERE p_partkey = l_partkey
      |  AND p_brand = 'Brand#23' AND p_container = 'MED BOX'
      |  AND CAST(l_quantity AS DOUBLE) < (
      |    SELECT (CAST(SUM(CAST(l2.l_quantity AS DECIMAL(18,6))) AS DOUBLE) / COUNT(*)) * 0.2
      |    FROM lineitem l2 WHERE l2.l_partkey = lineitem.l_partkey)""".stripMargin
}
