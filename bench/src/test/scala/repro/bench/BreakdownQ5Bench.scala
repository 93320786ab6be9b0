package repro.bench

import repro.SparkSpec
import repro.core.Strategy
import repro.harness.BreakdownHarness

/** Paper **Figure 3** in table form: Q5 time split into pre-filter phase vs
  * join phase per strategy. Shape claims: Yannakakis' semi-join phase
  * dominates its runtime and costs far more than Pred-Trans' Bloom transfer.
  */
class BreakdownQ5Bench extends SparkSpec {

  private lazy val report = BreakdownHarness.run(BenchData.tpch)

  test("Figure 3 table reproduces and is reported") {
    BenchData.report("fig3_breakdown", report.render)
    assert(report.rows.size == 4)
  }

  test("No-Pred-Trans spends nothing in the transfer phase") {
    assert(report.of(Strategy.NoPredTrans).transferMillis == 0.0)
  }

  test("Pred-Trans transfer phase is cheaper than Yannakakis semi-join phase") {
    val pt = report.of(Strategy.PredTrans).transferMillis
    val yan = report.of(Strategy.Yannakakis).transferMillis
    assert(pt < yan, f"bloom transfer $pt%.0fms vs semi-joins $yan%.0fms")
  }

  test("Pred-Trans join phase is faster than No-Pred-Trans join phase") {
    val pt = report.of(Strategy.PredTrans).joinMillis
    val npt = report.of(Strategy.NoPredTrans).joinMillis
    assert(pt < npt, f"join phase $pt%.0fms vs $npt%.0fms")
  }
}
