package repro.harness

import repro.core._
import repro.tpch.{QueryCatalog, TpchLite}

/** Reproduces **Table 1** of the paper: per-join hash-table (HT) and probe
  * (PR) input sizes for TPC-H Q5 under all four strategies, following the
  * fixed left-deep join order lineitem → supplier → orders → customer →
  * nation → region (5 join steps, matching the paper's Join 1..5).
  */
object Table1Harness {

  /** One strategy's column of Table 1. */
  final case class StrategyColumn(strategy: Strategy, steps: Seq[StepMetric])

  final case class Table1(sf: Double, columns: Seq[StrategyColumn]) {

    /** Render the same rows the paper prints. */
    def render: String = {
      val sb = new StringBuilder
      sb ++= s"Table 1: Join Table Size in Q5 (TPC-H-lite SF=$sf)\n"
      sb ++= ("|        | " + columns.map(c => f"${c.strategy.name}%-21s").mkString(" | ") + " |\n")
      sb ++= ("|        | " + columns.map(_ => f"${"HT"}%-10s ${"PR"}%-10s").mkString(" | ") + " |\n")
      val nSteps = columns.head.steps.size
      for (i <- 0 until nSteps) {
        val cells = columns.map { c =>
          val s = c.steps(i)
          f"${s.buildRows}%-10d ${s.probeRows}%-10d"
        }
        sb ++= (f"| Join ${i + 1}%d | " + cells.mkString(" | ") + " |\n")
      }
      sb.result()
    }

    /** Average join-input reduction of `a` relative to `b` (paper: Pred-Trans
      * reduces join table size by 98% over No-Pred-Trans).
      */
    def reductionVs(a: Strategy, b: Strategy): Double = {
      val ca = columns.find(_.strategy == a).get.steps
      val cb = columns.find(_.strategy == b).get.steps
      val ratios = ca.zip(cb).map { case (x, y) =>
        (x.buildRows + x.probeRows).toDouble / math.max(1L, y.buildRows + y.probeRows)
      }
      1.0 - ratios.sum / ratios.size
    }
  }

  /** Run Q5 under every strategy and collect the join input sizes. */
  def run(t: TpchLite): Table1 = {
    val q5 = QueryCatalog.byName("Q5").build(t)
    val columns = Strategy.all.map { s =>
      val m = Executor.runJoinMetrics(q5, s)
      StrategyColumn(s, m.steps.toSeq)
    }
    Table1(t.sf, columns)
  }
}
