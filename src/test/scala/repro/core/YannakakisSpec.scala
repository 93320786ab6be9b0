package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestData}

/** The Yannakakis baseline: BFS tree construction, cycle breaking, the
  * semi-join phase's dangling-tuple guarantee, result preservation.
  */
class YannakakisSpec extends SparkSpec {
  import spark.implicits._

  private def chainGraph = {
    val a = Seq(1L, 2L, 3L, 4L).toDF("a_k")
    val b = Seq((1L, 10L), (2L, 20L), (5L, 50L)).toDF("b_k", "b_j")
    val c = Seq(10L, 20L, 30L).toDF("c_j")
    JoinGraph(
      Seq(TableRef("a", a, 4L, Some(col("a_k") <= 2)),
          TableRef("b", b, 3L),
          TableRef("c", c, 3L)),
      Seq(JoinEdge("a", Seq("a_k"), "b", Seq("b_k")),
          JoinEdge("b", Seq("b_j"), "c", Seq("c_j"))))
  }

  test("BFS tree spans a connected graph with n-1 edges") {
    val tree = Yannakakis.bfsTree(chainGraph, "a")
    assert(tree.size == 2)
    assert((tree.map(_.child) :+ "a").toSet == Set("a", "b", "c"))
  }

  test("BFS tree from each root covers all vertices") {
    for (root <- Seq("a", "b", "c")) {
      val tree = Yannakakis.bfsTree(chainGraph, root)
      assert((tree.map(_.child) :+ root).toSet == Set("a", "b", "c"), s"root=$root")
      assert(tree.map(_.child).distinct.size == tree.size, "no vertex discovered twice")
    }
  }

  test("cycle breaking drops exactly the non-tree edges") {
    val q5 = repro.tpch.queries.Q5.build(TestData.tpch)
    // Q5's join graph has 6 edges over 6 vertices (one cycle).
    val tree = Yannakakis.bfsTree(q5.graph, "region")
    assert(tree.size == 5, "spanning tree of 6 vertices has 5 edges")
  }

  test("unknown root and disconnected graphs are rejected") {
    assertThrows[IllegalArgumentException](Yannakakis.bfsTree(chainGraph, "zz"))
    val disconnected = JoinGraph(
      Seq(TableRef("a", Seq(1L).toDF("a_k"), 1L),
          TableRef("b", Seq(1L).toDF("b_k"), 1L)),
      Nil)
    assertThrows[IllegalArgumentException](Yannakakis.bfsTree(disconnected, "a"))
  }

  test("semi-join phase removes all dangling tuples on an acyclic query") {
    for (root <- Seq("a", "b", "c")) {
      val reduced = Yannakakis.reduce(chainGraph, root)
      assert(reduced("a").collect().map(_.getLong(0)).toSet == Set(1L, 2L), s"root=$root")
      assert(reduced("b").collect().map(_.getLong(0)).toSet == Set(1L, 2L), s"root=$root")
      assert(reduced("c").collect().map(_.getLong(0)).toSet == Set(10L, 20L), s"root=$root")
    }
  }

  test("semi-join phase preserves the join result") {
    val g = chainGraph
    val plain = g.byName("a").filtered
      .join(g.byName("b").df, col("a_k") === col("b_k"))
      .join(g.byName("c").df, col("b_j") === col("c_j"))
    val reduced = Yannakakis.reduce(g, "b")
    val y = reduced("a")
      .join(reduced("b"), col("a_k") === col("b_k"))
      .join(reduced("c"), col("b_j") === col("c_j"))
    assert(TestData.canon(y) == TestData.canon(plain))
  }

  test("cyclic query: result preserved even though a cycle edge is dropped") {
    val q5 = repro.tpch.queries.Q5.build(TestData.tpch)
    val viaYannakakis = Executor.run(q5, Strategy.Yannakakis)
    val baseline = Executor.run(q5, Strategy.NoPredTrans)
    TestData.assertSameRows(viaYannakakis, baseline, "Q5 Yannakakis")
  }

  test("on cyclic graphs Yannakakis filters no more than full predicate transfer (exact)") {
    val q5 = repro.tpch.queries.Q5.build(TestData.tpch)
    val yan = Yannakakis.reduce(q5.graph, "region")
    val ptExact = PredicateTransfer.reduce(q5.graph, ExactFilterBuilder)
    // Pred-Trans transfers across every edge incl. the cycle edge, so its
    // exact variant reduces lineitem at least as much (paper §4.3).
    assert(ptExact("lineitem").count() <= yan("lineitem").count())
  }

  test("materialized run records reduced row counts and persists frames") {
    val m = new ExecMetrics
    val reduced = Yannakakis.reduce(chainGraph, "a", materialize = true, Some(m))
    assert(m.reducedRows.keySet == Set("a", "b", "c"))
    assert(m.reducedRows("c") == 2L)
    assert(m.transferNanos > 0L)
    assert(m.persisted.nonEmpty)
    m.release()
    assert(reduced.size == 3)
  }

  test("multi-key tree edges semi-join on the whole tuple") {
    val l = Seq((1L, 1L), (1L, 2L), (2L, 1L)).toDF("l_p", "l_s")
    val ps = Seq((1L, 1L), (2L, 1L)).toDF("ps_p", "ps_s")
    val g = JoinGraph(
      Seq(TableRef("l", l, 3L), TableRef("ps", ps, 2L)),
      Seq(JoinEdge("l", Seq("l_p", "l_s"), "ps", Seq("ps_p", "ps_s"))))
    val reduced = Yannakakis.reduce(g, "ps")
    assert(reduced("l").collect().map(r => (r.getLong(0), r.getLong(1))).toSet ==
      Set((1L, 1L), (2L, 1L)))
  }
}
