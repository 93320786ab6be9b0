package repro.core

import repro.{SparkSpec, TestData}
import scala.util.Random

/** Orientation heuristic: smaller→bigger, DAG, deterministic, edge-preserving. */
class TransferGraphSpec extends SparkSpec {

  private def ref(name: String, rows: Long) = {
    import spark.implicits._
    TableRef(name, Seq(1L).toDF(s"${name}_k"), rows)
  }

  private def graph(sizes: Map[String, Long], edges: Seq[(String, String)]) =
    JoinGraph(
      sizes.toSeq.sortBy(_._1).map { case (n, r) => ref(n, r) },
      edges.map { case (a, b) => JoinEdge(a, Seq(s"${a}_k"), b, Seq(s"${b}_k")) })

  test("edges point from smaller to bigger table") {
    val g = graph(Map("a" -> 10L, "b" -> 100L, "c" -> 1000L),
      Seq("a" -> "b", "b" -> "c", "c" -> "a"))
    val tg = TransferGraph.orient(g)
    tg.edges.foreach { e =>
      assert(g.byName(e.from).estRows <= g.byName(e.to).estRows, s"$e")
    }
  }

  test("order is ascending by estRows") {
    val tg = TransferGraph.orient(graph(
      Map("x" -> 5L, "y" -> 1L, "z" -> 3L), Seq("x" -> "y", "y" -> "z")))
    assert(tg.order == Seq("y", "z", "x"))
  }

  test("no edge is dropped (paper keeps the full join graph)") {
    val es = Seq("a" -> "b", "b" -> "c", "c" -> "a", "a" -> "c")
    val tg = TransferGraph.orient(graph(Map("a" -> 1L, "b" -> 2L, "c" -> 3L), es))
    assert(tg.edges.size == es.size)
  }

  test("ties break deterministically by name") {
    val tg = TransferGraph.orient(graph(
      Map("m" -> 7L, "k" -> 7L), Seq("m" -> "k")))
    assert(tg.order == Seq("k", "m"))
    assert(tg.edges.head.from == "k" && tg.edges.head.to == "m")
  }

  test("orientation of random graphs is always acyclic (property, 25 samples)") {
    val rnd = new Random(123)
    for (iter <- 1 to 25) {
      val n = 2 + rnd.nextInt(8)
      val names = (0 until n).map(i => s"t$i")
      val sizes = names.map(_ -> (1L + rnd.nextInt(1000000))).toMap
      // random connected-ish edge set: chain + extras (extras may duplicate)
      val chain = names.sliding(2).map(p => p(0) -> p(1)).toSeq
      val extra = Seq.fill(rnd.nextInt(2 * n))(
        (names(rnd.nextInt(n)), names(rnd.nextInt(n)))).filter(p => p._1 != p._2)
      val tg = TransferGraph.orient(graph(sizes, chain ++ extra))
      // every edge respects the topological position — hence no cycle
      val pos = tg.order.zipWithIndex.toMap
      tg.edges.foreach(e => assert(pos(e.from) <= pos(e.to), s"iter $iter: $e"))
      assert(tg.order.sorted == names.sorted)
    }
  }

  test("reversed flips every edge and the visit order") {
    val tg = TransferGraph.orient(graph(
      Map("a" -> 1L, "b" -> 2L, "c" -> 3L), Seq("a" -> "b", "b" -> "c")))
    val r = tg.reversed
    assert(r.order == tg.order.reverse)
    assert(r.edges.map(e => (e.from, e.to)).toSet ==
      tg.edges.map(e => (e.to, e.from)).toSet)
    assert(r.edges.head.fromKeys == tg.edges.find(
      e => e.to == r.edges.head.from).get.toKeys)
  }

  test("incoming/outgoing are consistent partitions of the edge set") {
    val tg = TransferGraph.orient(graph(
      Map("a" -> 1L, "b" -> 2L, "c" -> 3L, "d" -> 4L),
      Seq("a" -> "b", "a" -> "c", "b" -> "d", "c" -> "d")))
    for (v <- tg.order) {
      tg.outgoing(v).foreach(e => assert(e.from == v))
      tg.incoming(v).foreach(e => assert(e.to == v))
    }
    assert(tg.order.flatMap(tg.outgoing).size == tg.edges.size)
    assert(tg.order.flatMap(tg.incoming).size == tg.edges.size)
  }

  test("Q5's orientation matches the paper's Figure 1b") {
    val q5 = repro.tpch.queries.Q5.build(TestData.tpch)
    val tg = TransferGraph.orient(q5.graph)
    assert(tg.order == Seq("region", "nation", "supplier", "customer", "orders", "lineitem"))
    def dir(a: String, b: String) =
      tg.edges.exists(e => e.from == a && e.to == b)
    assert(dir("region", "nation"))
    assert(dir("nation", "supplier"))
    assert(dir("supplier", "customer")) // c_nationkey = s_nationkey edge
    assert(dir("supplier", "lineitem"))
    assert(dir("customer", "orders"))
    assert(dir("orders", "lineitem"))
  }
}
