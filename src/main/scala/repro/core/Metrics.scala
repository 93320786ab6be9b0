package repro.core

import org.apache.spark.sql.DataFrame
import scala.collection.mutable

/** Input sizes of one left-deep join step — the paper's Table 1 columns.
  *
  * @param index      1-based join number in the left-deep order
  * @param buildTable name of the build-side table
  * @param buildRows  rows entering the hash table (paper's "HT")
  * @param probeRows  rows probing the hash table, i.e. the current
  *                   intermediate after any inline Bloom filtering
  *                   (paper's "PR")
  */
final case class StepMetric(index: Int, buildTable: String, buildRows: Long, probeRows: Long)

/** Mutable measurement sink for one strategy execution. */
final class ExecMetrics {
  /** Wall time of the pre-filter phase (Bloom builds / semi-joins /
    * reduced-table materialization). Zero for No-Pred-Trans.
    */
  var transferNanos: Long = 0L

  /** Wall time of the join phase (join execution + finish + collect). */
  var joinNanos: Long = 0L

  /** Per-join input sizes, populated only in metric runs. */
  val steps: mutable.ArrayBuffer[StepMetric] = mutable.ArrayBuffer.empty

  /** Rows of each reduced table after the pre-filter phase, populated when
    * reduced tables are materialized.
    */
  val reducedRows: mutable.LinkedHashMap[String, Long] = mutable.LinkedHashMap.empty

  /** Rows of the final query result (set by metric/timed runs). */
  var resultRows: Long = 0L

  /** DataFrames persisted during this run; released by [[release]]. */
  val persisted: mutable.ArrayBuffer[DataFrame] = mutable.ArrayBuffer.empty

  /** Unpersist everything this run cached. */
  def release(): Unit = {
    persisted.foreach(_.unpersist(blocking = false))
    persisted.clear()
  }

  def transferMillis: Double = transferNanos / 1e6
  def joinMillis: Double = joinNanos / 1e6
  def totalMillis: Double = transferMillis + joinMillis

  /** Time a block into the transfer phase. */
  def timeTransfer[A](block: => A): A = {
    val t0 = System.nanoTime(); val r = block
    transferNanos += System.nanoTime() - t0; r
  }

  /** Time a block into the join phase. */
  def timeJoin[A](block: => A): A = {
    val t0 = System.nanoTime(); val r = block
    joinNanos += System.nanoTime() - t0; r
  }
}
