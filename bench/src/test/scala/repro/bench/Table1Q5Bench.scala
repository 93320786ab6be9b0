package repro.bench

import repro.SparkSpec
import repro.core.Strategy
import repro.harness.Table1Harness

/** Paper **Table 1**: Q5 per-join HT/PR input sizes under all strategies.
  * Asserts the qualitative shape the paper reports; the numbers land in
  * `results/table1.txt` for EXPERIMENTS.md.
  */
class Table1Q5Bench extends SparkSpec {

  private lazy val table1 = Table1Harness.run(BenchData.tpch)

  test("Table 1 reproduces and is reported") {
    BenchData.report("table1", table1.render)
    assert(table1.columns.size == 4)
    assert(table1.columns.forall(_.steps.size == 5), "Q5 has 5 left-deep joins")
  }

  test("Pred-Trans reduces join inputs by >90% vs No-Pred-Trans (paper: 98%)") {
    val red = table1.reductionVs(Strategy.PredTrans, Strategy.NoPredTrans)
    assert(red > 0.9, f"reduction only ${red * 100}%.1f%%")
  }

  test("Pred-Trans reduces join inputs vs Bloom Join (paper: 97%)") {
    val red = table1.reductionVs(Strategy.PredTrans, Strategy.BloomJoin)
    assert(red > 0.5, f"reduction only ${red * 100}%.1f%%")
  }

  test("Bloom Join cannot pre-filter lineitem before the first join") {
    def steps(s: Strategy) = table1.columns.find(_.strategy == s).get.steps
    // Join 1 probes lineitem with supplier as build side; supplier has no
    // local predicate, so Bloom Join's first probe stays ~full-size while
    // Pred-Trans has already shrunk it.
    val bjJoin1 = steps(Strategy.BloomJoin).head.probeRows
    val nptJoin1 = steps(Strategy.NoPredTrans).head.probeRows
    val ptJoin1 = steps(Strategy.PredTrans).head.probeRows
    assert(bjJoin1 > nptJoin1 / 2, "supplier bloom should barely filter lineitem")
    assert(ptJoin1 < nptJoin1 / 20, "pred-trans must pre-filter lineitem")
  }

  test("Yannakakis filters, but less than Pred-Trans on this cyclic query") {
    def total(s: Strategy) = table1.columns.find(_.strategy == s).get
      .steps.map(st => st.buildRows + st.probeRows).sum
    assert(total(Strategy.Yannakakis) < total(Strategy.NoPredTrans))
    assert(total(Strategy.PredTrans) <= total(Strategy.Yannakakis))
  }
}
