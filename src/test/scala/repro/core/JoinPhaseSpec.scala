package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestData}

/** Left-deep join execution: correctness, multi-edge steps, inline bloom
  * (Bloom Join), HT/PR metrics against hand-counted values.
  */
class JoinPhaseSpec extends SparkSpec {
  import spark.implicits._

  // a(k) ⋈ b(k, j) ⋈ c(j); sizes chosen so counts are easy to verify.
  private def tiny = {
    val a = Seq(1L, 2L, 3L).toDF("a_k")
    val b = Seq((1L, 10L), (2L, 20L), (2L, 21L), (4L, 40L)).toDF("b_k", "b_j")
    val c = Seq(10L, 20L, 21L, 99L).toDF("c_j")
    JoinQuery(
      JoinGraph(
        Seq(TableRef("a", a, 3L), TableRef("b", b, 4L), TableRef("c", c, 4L)),
        Seq(JoinEdge("a", Seq("a_k"), "b", Seq("b_k")),
            JoinEdge("b", Seq("b_j"), "c", Seq("c_j")))),
      joinOrder = Seq("a", "b", "c"))
  }

  private def baseTables(q: JoinQuery) =
    q.graph.tables.map(t => t.name -> t.filtered).toMap

  test("left-deep execution matches a plain SQL join") {
    val got = JoinPhase.execute(tiny, baseTables(tiny))
    val q = tiny
    val plain = q.graph.byName("a").df
      .join(q.graph.byName("b").df, col("a_k") === col("b_k"))
      .join(q.graph.byName("c").df, col("b_j") === col("c_j"))
    TestData.assertSameRows(got, plain)
    assert(got.count() == 3L) // (1,10) (2,20) (2,21)
  }

  test("metrics record per-step HT and PR counts") {
    val m = new ExecMetrics
    JoinPhase.execute(tiny, baseTables(tiny), metrics = Some(m), collectStepSizes = true)
    assert(m.steps.size == 2)
    val s1 = m.steps(0); val s2 = m.steps(1)
    assert(s1.index == 1 && s1.buildTable == "b")
    assert(s1.buildRows == 4L && s1.probeRows == 3L) // b=4 rows, a=3 rows
    assert(s2.index == 2 && s2.buildTable == "c")
    assert(s2.buildRows == 4L && s2.probeRows == 3L) // a⋈b = 3 rows
    assert(m.resultRows == 3L)
  }

  test("inline bloom (Bloom Join) shrinks the probe side before the join") {
    val m = new ExecMetrics
    JoinPhase.execute(tiny, baseTables(tiny),
      inlineBloom = Some(BloomFilterBuilder()),
      metrics = Some(m), collectStepSizes = true)
    // step 1: bloom on b's keys {1,2,4} keeps a-rows {1,2} (3 would need a
    // false positive — tolerate ≤ 3)
    assert(m.steps(0).probeRows <= 3L && m.steps(0).probeRows >= 2L)
    assert(m.steps(0).buildRows == 4L, "build side is never filtered by its own bloom")
    assert(m.transferNanos > 0L, "bloom build time is charged to the transfer phase")
  }

  test("inline bloom preserves the join result") {
    val plain = JoinPhase.execute(tiny, baseTables(tiny))
    val bloom = JoinPhase.execute(tiny, baseTables(tiny),
      inlineBloom = Some(BloomFilterBuilder()))
    TestData.assertSameRows(bloom, plain)
  }

  test("a step joining on two edges ANDs both conditions") {
    // d joins a on k and c on j simultaneously (closing a triangle).
    val a = Seq((1L, 10L), (2L, 20L)).toDF("a_k", "a_j")
    val d = Seq((1L, 10L), (1L, 99L), (2L, 20L)).toDF("d_k", "d_j")
    val q = JoinQuery(
      JoinGraph(
        Seq(TableRef("a", a, 2L), TableRef("d", d, 3L)),
        Seq(JoinEdge("a", Seq("a_k"), "d", Seq("d_k")),
            JoinEdge("a", Seq("a_j"), "d", Seq("d_j")))),
      joinOrder = Seq("a", "d"))
    val got = JoinPhase.execute(q, baseTables(q))
    // (1,99) must be dropped: k matches but j does not.
    assert(got.count() == 2L)
  }

  test("postJoinFilter applies after all joins") {
    val q = tiny.copy(postJoinFilter = Some(col("c_j") > 15))
    val got = JoinPhase.execute(q, baseTables(q))
    assert(got.count() == 2L) // keeps (2,20) and (2,21)
  }

  test("finish runs last, over the filtered join") {
    val q = tiny.copy(finish = _.agg(count(lit(1)).as("n")))
    val got = JoinPhase.execute(q, baseTables(q))
    assert(got.head.getLong(0) == 3L)
  }

  test("composite-key join step matches on the whole tuple") {
    val l = Seq((1L, 1L), (1L, 2L), (2L, 1L)).toDF("l_p", "l_s")
    val ps = Seq((1L, 1L), (2L, 1L)).toDF("ps_p", "ps_s")
    val q = JoinQuery(
      JoinGraph(
        Seq(TableRef("l", l, 3L), TableRef("ps", ps, 2L)),
        Seq(JoinEdge("l", Seq("l_p", "l_s"), "ps", Seq("ps_p", "ps_s")))),
      joinOrder = Seq("l", "ps"))
    assert(JoinPhase.execute(q, baseTables(q)).count() == 2L)
  }

  test("different join orders give the same result") {
    val q = tiny
    val o1 = JoinPhase.execute(q, baseTables(q))
    val o2 = JoinPhase.execute(q.withJoinOrder(Seq("c", "b", "a")), baseTables(q))
    val o3 = JoinPhase.execute(q.withJoinOrder(Seq("b", "a", "c")), baseTables(q))
    TestData.assertSameRows(o2, o1)
    TestData.assertSameRows(o3, o1)
  }
}
