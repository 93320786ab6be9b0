package repro.bench

import repro.SparkSpec
import repro.core.Strategy
import repro.harness.SpeedupHarness
import repro.tpch.QueryCatalog

/** Paper **Figure 2** in table form: per-query warm runtimes of the four
  * strategies, normalized to No-Pred-Trans, and the geomean speedups
  * (paper: Pred-Trans 3.8× over No-Pred-Trans, 3.1× over Bloom Join, 3.7×
  * over Yannakakis at SF1 on a single-core Arrow engine).
  *
  * Assertions are on the *shape* (which strategy wins on multi-join
  * queries), not on absolute factors — the substrate differs (see DESIGN.md).
  */
class SpeedupBench extends SparkSpec {

  private lazy val report = SpeedupHarness.run(BenchData.tpch)

  test("Figure 2 table reproduces and is reported") {
    BenchData.report("fig2_speedup", report.render)
    assert(report.rows.size == QueryCatalog.all.size)
  }

  test("Pred-Trans beats No-Pred-Trans on the multi-join queries (geomean)") {
    val multi = report.rows.filter(r =>
      QueryCatalog.multiJoin.exists(_.name == r.query))
    val g = math.exp(multi.map(r =>
      math.log(r.speedupOver(Strategy.NoPredTrans))).sum / multi.size)
    assert(g > 1.0, f"geomean speedup on multi-join queries only $g%.2fx")
  }

  test("Pred-Trans beats Yannakakis overall (geomean)") {
    assert(report.geomeanSpeedup(Strategy.Yannakakis) > 1.0,
      f"got ${report.geomeanSpeedup(Strategy.Yannakakis)}%.2fx")
  }

  test("every strategy returned the same result cardinality per query") {
    for (r <- report.rows) {
      val counts = r.cells.map(_.resultRows).distinct
      assert(counts.size == 1, s"${r.query}: divergent result sizes $counts")
    }
  }
}
