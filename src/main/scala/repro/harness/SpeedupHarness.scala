package repro.harness

import repro.core._
import repro.tpch.{LiteQuery, QueryCatalog, TpchLite}

/** Reproduces **Figure 2** (in table form): warm runtime of every
  * TPC-H-lite query under every strategy, normalized to No-Pred-Trans, plus
  * the paper's headline geomean speedups (3.8× over No-Pred-Trans, 3.1× over
  * Bloom Join, 3.7× over Yannakakis).
  *
  * As in the paper (§4.1), each query runs twice per strategy and the second
  * (in-memory) run is measured; base tables are cached up front.
  */
object SpeedupHarness {

  final case class Cell(strategy: Strategy, millis: Double, resultRows: Long)
  final case class QueryRow(query: String, cells: Seq[Cell]) {
    def millisOf(s: Strategy): Double = cells.find(_.strategy == s).get.millis

    /** Normalized runtime (1.0 = No-Pred-Trans), the y-axis of Figure 2. */
    def normalized(s: Strategy): Double = millisOf(s) / millisOf(Strategy.NoPredTrans)

    /** Speedup of Pred-Trans over `s`. */
    def speedupOver(s: Strategy): Double = millisOf(s) / millisOf(Strategy.PredTrans)
  }

  final case class Report(sf: Double, rows: Seq[QueryRow]) {
    def geomeanSpeedup(over: Strategy): Double = {
      val xs = rows.map(_.speedupOver(over))
      math.exp(xs.map(math.log).sum / xs.size)
    }

    def render: String = {
      val sb = new StringBuilder
      sb ++= s"Figure 2 (table form): runtime per query/strategy, TPC-H-lite SF=$sf\n"
      sb ++= f"| query | ${Strategy.all.map(s => f"${s.name}%-15s").mkString(" | ")} | norm PT | PT speedup vs NPT/BJ/Yan |\n"
      for (r <- rows) {
        val times = Strategy.all.map(s => f"${r.millisOf(s)}%13.0fms").mkString(" | ")
        sb ++= f"| ${r.query}%-5s | $times | ${r.normalized(Strategy.PredTrans)}%7.3f | " +
          f"${r.speedupOver(Strategy.NoPredTrans)}%5.2fx / ${r.speedupOver(Strategy.BloomJoin)}%5.2fx / ${r.speedupOver(Strategy.Yannakakis)}%5.2fx |\n"
      }
      sb ++= f"geomean speedup of Pred-Trans: ${geomeanSpeedup(Strategy.NoPredTrans)}%.2fx over No-Pred-Trans, "
      sb ++= f"${geomeanSpeedup(Strategy.BloomJoin)}%.2fx over Bloom Join, "
      sb ++= f"${geomeanSpeedup(Strategy.Yannakakis)}%.2fx over Yannakakis\n"
      sb.result()
    }
  }

  /** Measure one query under one strategy: run `warmups`+1 times, report the
    * last run's phase-summed wall time.
    */
  def measure(q: LiteQuery, t: TpchLite, s: Strategy, warmups: Int = 1): Cell = {
    var last: ExecMetrics = null
    for (_ <- 0 to warmups) last = q.runTimed(t, s)
    Cell(s, last.totalMillis, last.resultRows)
  }

  def run(t: TpchLite, queries: Seq[LiteQuery] = QueryCatalog.all,
          warmups: Int = 1): Report =
    Report(t.sf, queries.map { q =>
      QueryRow(q.name, Strategy.all.map(s => measure(q, t, s, warmups)))
    })
}
