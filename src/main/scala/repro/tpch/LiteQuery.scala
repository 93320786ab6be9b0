package repro.tpch

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.core._

/** One TPC-H-lite query: a [[repro.core.JoinQuery]] spec over a [[TpchLite]]
  * dataset plus the DuckDB SQL the result must match.
  *
  * Queries with a decorrelated subquery (Q2, Q17, Q18) override [[execute]]
  * to run the subquery first (single-table subqueries run as plain
  * aggregations, multi-table ones under the same strategy), exactly the
  * paper's §3.4 heuristic; the subquery result then joins — and transfers
  * predicates — like any other table.
  */
trait LiteQuery {
  /** TPC-H query name, e.g. "Q5". */
  def name: String

  /** Base tables the DuckDB oracle must register (self-joins list once). */
  def oracleTableNames: Seq[String]

  /** Reference SQL run by DuckDB over the registered base tables. */
  def oracleSql: String

  /** The main join-query spec. */
  def build(t: TpchLite): JoinQuery

  /** Execute under a strategy. Default: single-block execution. */
  def execute(t: TpchLite, strategy: Strategy,
              opts: ExecOpts = ExecOpts(),
              metrics: Option[ExecMetrics] = None): DataFrame =
    Executor.execute(build(t), strategy, opts, metrics)

  /** Timed execution (collects the result). */
  def runTimed(t: TpchLite, strategy: Strategy,
               opts: ExecOpts = ExecOpts()): ExecMetrics = {
    val m = new ExecMetrics
    val df = execute(t, strategy, opts.copy(materializeReduced = true), Some(m))
    val rows = m.timeJoin(df.collect())
    m.resultRows = rows.length.toLong
    m.release()
    m
  }
}

/** Shared column helpers used by the query definitions. */
object LiteQuery {
  /** `SUM(CAST(e AS DECIMAL(18,4)))` — exact, order-independent aggregate so
    * Spark and DuckDB agree bit-for-bit (see DESIGN.md "numeric discipline").
    */
  def decSum(e: Column): Column = sum(e.cast("decimal(18,4)"))

  /** The ubiquitous `l_extendedprice * (1 - l_discount)` revenue addend. */
  def revenue: Column = col("l_extendedprice") * (lit(1) - col("l_discount"))

  /** DuckDB-side spelling of [[decSum]] over [[revenue]]. */
  val duckRevenueSum: String =
    "SUM(CAST(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)) AS DECIMAL(18,4)))"

  /** Materialize `df` (charged to the transfer phase) when the run
    * materializes reduced tables — used for decorrelated subquery results so
    * per-strategy filter builds over them do not recompute the subquery.
    * Uses localCheckpoint to also truncate lineage: subquery results executed
    * under Yannakakis embed nested semi-join plans that would otherwise blow
    * up plan size in the consuming query.
    */
  def materializeIf(df: DataFrame, opts: ExecOpts,
                    metrics: Option[ExecMetrics]): DataFrame =
    if (!opts.materializeReduced) df
    else metrics match {
      case Some(m) =>
        val p = m.timeTransfer(df.localCheckpoint())
        m.persisted += p
        p
      case None => df.localCheckpoint()
    }
}
