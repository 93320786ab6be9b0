package repro.tpch

import repro.{SparkSpec, TestData}
import repro.core._
import repro.tpch.queries.Q5

/** The paper's qualitative claims at test scale (SF 0.01): Pred-Trans join
  * inputs ≤ Bloom Join ≤ No-Pred-Trans; Pred-Trans cuts Q5's fact table by
  * ~99%; Yannakakis on cyclic Q5 filters less than Pred-Trans.
  */
class ReductionEffectivenessSpec extends SparkSpec {

  private lazy val t = TestData.tpch
  private lazy val q5 = Q5.build(t)

  private def totalInput(s: Strategy): Long = {
    val m = Executor.runJoinMetrics(q5, s)
    m.steps.map(st => st.buildRows + st.probeRows).sum
  }

  test("Q5 join inputs: Pred-Trans ≤ Bloom Join ≤ No-Pred-Trans") {
    val npt = totalInput(Strategy.NoPredTrans)
    val bj = totalInput(Strategy.BloomJoin)
    val pt = totalInput(Strategy.PredTrans)
    assert(pt <= bj, s"PredTrans $pt vs BloomJoin $bj")
    assert(bj <= npt, s"BloomJoin $bj vs NoPredTrans $npt")
    assert(pt < npt / 10, s"paper reports ~98% reduction; got $pt vs $npt")
  }

  test("Q5 Pred-Trans prunes lineitem before any join") {
    val reduced = PredicateTransfer.reduce(q5.graph, BloomFilterBuilder())
    val li = reduced("lineitem").count()
    val base = t.estRows("lineitem")
    // paper Table 1: 6M → 63K probe rows (~1%); allow slack for bloom fps
    assert(li < base / 20, s"lineitem only reduced to $li of $base")
  }

  test("Q5 Yannakakis (cycle broken) filters less than exact Pred-Trans") {
    val yan = Yannakakis.reduce(q5.graph, "region")
    val pt = PredicateTransfer.reduce(q5.graph, ExactFilterBuilder)
    val yanTotal = q5.graph.tables.map(t => yan(t.name).count()).sum
    val ptTotal = q5.graph.tables.map(t => pt(t.name).count()).sum
    assert(ptTotal <= yanTotal, s"pt=$ptTotal yan=$yanTotal")
  }

  test("Q5 No-Pred-Trans HT column reproduces the paper shape at SF 0.01") {
    val m = Executor.runJoinMetrics(q5, Strategy.NoPredTrans)
    val ht = m.steps.map(_.buildRows)
    // paper at SF1: 10K, 228K, 150K, 25, 1 → at SF 0.01: 100, ~2.3K, 1.5K, 25, 1
    assert(ht(0) == 100L)                    // supplier
    assert(ht(1) > 1500L && ht(1) < 3500L)   // orders after date filter
    assert(ht(2) == 1500L)                   // customer
    assert(ht(3) == 25L)                     // nation
    assert(ht(4) == 1L)                      // region after r_name filter
  }

  test("Q2 Pred-Trans reduces main-query join input by >90% (paper: >99%)") {
    val t0 = QueryCatalog.byName("Q2")
    val mNpt = new ExecMetrics
    val mPt = new ExecMetrics
    t0.execute(t, Strategy.NoPredTrans,
      ExecOpts(collectStepSizes = true), Some(mNpt)).collect()
    t0.execute(t, Strategy.PredTrans,
      ExecOpts(collectStepSizes = true), Some(mPt)).collect()
    val npt = mNpt.steps.map(s => s.buildRows + s.probeRows).sum
    val pt = mPt.steps.map(s => s.buildRows + s.probeRows).sum
    assert(pt < npt / 10, s"pt=$pt npt=$npt")
  }

  test("Q18's selective HAVING table transfers to lineitem") {
    val q = queries.Q18.mainQuery(t, queries.Q18.bigOrders(t))
    val reduced = PredicateTransfer.reduce(q.graph, BloomFilterBuilder())
    val li = reduced("lineitem").count()
    assert(li < t.estRows("lineitem") / 10,
      s"lineitem should shrink via the bigorders filter, got $li")
  }
}
