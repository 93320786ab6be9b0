package repro.tpch.queries

import org.apache.spark.sql.functions._
import org.apache.spark.sql.DataFrame
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q2 (lite): the paper's biggest winner (45× over No-Pred-Trans).
  * A correlated min-supplycost subquery shares partsupp/supplier with the
  * main query; we decorrelate it into a per-part min-cost table that is
  * computed first — itself a multi-join executed under the *same* strategy —
  * and then joins (and transfers predicates) like any other table, following
  * the paper's §3.4 partial-execution heuristic.
  */
object Q2 extends LiteQuery {
  override val name = "Q2"
  override val oracleTableNames = Seq("part", "supplier", "partsupp", "nation", "region")

  /** The decorrelated subquery: min supply cost per part among EUROPE
    * suppliers (a 4-table join, run under the active strategy).
    */
  def subquery(t: TpchLite): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("partsupp",
          t.partsupp.select("ps_partkey", "ps_suppkey", "ps_supplycost"),
          t.estRows("partsupp")),
        TableRef("supplier",
          t.supplier.select("s_suppkey", "s_nationkey"),
          t.estRows("supplier")),
        TableRef("nation",
          t.nation.select("n_nationkey", "n_regionkey"),
          t.estRows("nation")),
        TableRef("region",
          t.region.select("r_regionkey", "r_name"),
          t.estRows("region"),
          Some(col("r_name") === "EUROPE")),
      ),
      edges = Seq(
        JoinEdge("partsupp", Seq("ps_suppkey"), "supplier", Seq("s_suppkey")),
        JoinEdge("supplier", Seq("s_nationkey"), "nation", Seq("n_nationkey")),
        JoinEdge("nation", Seq("n_regionkey"), "region", Seq("r_regionkey")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("partsupp", "supplier", "nation", "region"),
      finish = _.groupBy("ps_partkey")
        .agg(min("ps_supplycost").as("mc_cost"))
        .select(col("ps_partkey").as("mc_partkey"), col("mc_cost")),
    )
  }

  /** Main query over part/supplier/partsupp/nation/region + the min-cost
    * table; the (partkey, supplycost) = (mc_partkey, mc_cost) equality is a
    * composite-key transfer edge.
    */
  def mainQuery(t: TpchLite, minCost: DataFrame): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("part",
          t.part.select("p_partkey", "p_size", "p_type"),
          t.estRows("part"),
          Some(col("p_size") === 15 && col("p_type") === "STANDARD")),
        TableRef("supplier",
          t.supplier.select("s_suppkey", "s_nationkey", "s_acctbal"),
          t.estRows("supplier")),
        TableRef("partsupp",
          t.partsupp.select("ps_partkey", "ps_suppkey", "ps_supplycost"),
          t.estRows("partsupp")),
        TableRef("nation",
          t.nation.select("n_nationkey", "n_regionkey", "n_name"),
          t.estRows("nation")),
        TableRef("region",
          t.region.select("r_regionkey", "r_name"),
          t.estRows("region"),
          Some(col("r_name") === "EUROPE")),
        TableRef("mincost", minCost, t.estRows("part")),
      ),
      edges = Seq(
        JoinEdge("part", Seq("p_partkey"), "partsupp", Seq("ps_partkey")),
        JoinEdge("supplier", Seq("s_suppkey"), "partsupp", Seq("ps_suppkey")),
        JoinEdge("supplier", Seq("s_nationkey"), "nation", Seq("n_nationkey")),
        JoinEdge("nation", Seq("n_regionkey"), "region", Seq("r_regionkey")),
        JoinEdge("partsupp", Seq("ps_partkey", "ps_supplycost"),
                 "mincost", Seq("mc_partkey", "mc_cost")),
      ),
    )
    JoinQuery(
      graph,
      joinOrder = Seq("partsupp", "part", "mincost", "supplier", "nation", "region"),
      finish = _.select(col("s_acctbal"), col("n_name"), col("p_partkey"), col("s_suppkey"))
        .orderBy(desc("s_acctbal"), col("n_name"), col("p_partkey"), col("s_suppkey"))
        .limit(100),
    )
  }

  override def build(t: TpchLite): JoinQuery =
    mainQuery(t, Executor.run(subquery(t), Strategy.NoPredTrans))

  override def execute(t: TpchLite, strategy: Strategy, opts: ExecOpts,
                       metrics: Option[ExecMetrics]): DataFrame = {
    val mc = Executor.execute(subquery(t), strategy,
      opts.copy(collectStepSizes = false), metrics)
    Executor.execute(mainQuery(t, materializeIf(mc, opts, metrics)),
      strategy, opts, metrics)
  }

  override val oracleSql: String =
    """SELECT CAST(s_acctbal AS DOUBLE) AS s_acctbal, n_name, p_partkey, s_suppkey
      |FROM part, supplier, partsupp, nation, region
      |WHERE p_partkey = ps_partkey AND s_suppkey = ps_suppkey
      |  AND CAST(p_size AS INT) = 15 AND p_type = 'STANDARD'
      |  AND s_nationkey = n_nationkey AND n_regionkey = r_regionkey
      |  AND r_name = 'EUROPE'
      |  AND CAST(ps_supplycost AS DOUBLE) = (
      |    SELECT MIN(CAST(ps2.ps_supplycost AS DOUBLE))
      |    FROM partsupp ps2, supplier s2, nation n2, region r2
      |    WHERE ps2.ps_partkey = part.p_partkey AND s2.s_suppkey = ps2.ps_suppkey
      |      AND s2.s_nationkey = n2.n_nationkey AND n2.n_regionkey = r2.r_regionkey
      |      AND r2.r_name = 'EUROPE')
      |ORDER BY CAST(s_acctbal AS DOUBLE) DESC, n_name, CAST(p_partkey AS BIGINT), CAST(s_suppkey AS BIGINT)
      |LIMIT 100""".stripMargin
}
