package repro.core

import repro.SparkSpec

/** Eager validation of query specs: malformed graphs must fail fast. */
class JoinGraphSpec extends SparkSpec {
  import spark.implicits._

  private def ref(name: String, cols: String*) =
    TableRef(name, Seq((1L, 2L)).toDF(cols.head, cols(1)), 10L)

  test("valid graph constructs and exposes adjacency") {
    val g = JoinGraph(
      Seq(ref("a", "a_k", "a_v"), ref("b", "b_k", "b_v"), ref("c", "c_k", "c_v")),
      Seq(JoinEdge("a", Seq("a_k"), "b", Seq("b_k")),
          JoinEdge("b", Seq("b_v"), "c", Seq("c_k"))))
    assert(g.neighbours("b") == Set("a", "c"))
    assert(g.edgesOf("a").size == 1)
    assert(g.isConnected)
  }

  test("duplicate table names are rejected") {
    assertThrows[IllegalArgumentException] {
      JoinGraph(Seq(ref("a", "a_k", "a_v"), ref("a", "x_k", "x_v")), Nil)
    }
  }

  test("edge referencing an unknown table is rejected") {
    assertThrows[IllegalArgumentException] {
      JoinGraph(Seq(ref("a", "a_k", "a_v")),
        Seq(JoinEdge("a", Seq("a_k"), "zz", Seq("z_k"))))
    }
  }

  test("edge referencing a missing column is rejected") {
    assertThrows[IllegalArgumentException] {
      JoinGraph(Seq(ref("a", "a_k", "a_v"), ref("b", "b_k", "b_v")),
        Seq(JoinEdge("a", Seq("nope"), "b", Seq("b_k"))))
    }
  }

  test("shared column names across tables are rejected") {
    assertThrows[IllegalArgumentException] {
      JoinGraph(Seq(ref("a", "k", "a_v"), ref("b", "k", "b_v")), Nil)
    }
  }

  test("mismatched key arity is rejected at edge construction") {
    assertThrows[IllegalArgumentException] {
      JoinEdge("a", Seq("x", "y"), "b", Seq("z"))
    }
  }

  test("self-loop edges are rejected") {
    assertThrows[IllegalArgumentException] {
      JoinEdge("a", Seq("x"), "a", Seq("x"))
    }
  }

  test("disconnected graph is detected") {
    val g = JoinGraph(
      Seq(ref("a", "a_k", "a_v"), ref("b", "b_k", "b_v"), ref("c", "c_k", "c_v")),
      Seq(JoinEdge("a", Seq("a_k"), "b", Seq("b_k"))))
    assert(!g.isConnected)
  }

  test("single-table graph is connected") {
    assert(JoinGraph(Seq(ref("a", "a_k", "a_v")), Nil).isConnected)
  }

  test("JoinEdge helper accessors") {
    val e = JoinEdge("a", Seq("a_k"), "b", Seq("b_k"))
    assert(e.keysOf("a") == Seq("a_k"))
    assert(e.keysOpposite("a") == Seq("b_k"))
    assert(e.other("b") == "a")
    assert(e.touches("a") && e.touches("b") && !e.touches("c"))
    assertThrows[IllegalArgumentException](e.keysOf("zz"))
    assertThrows[IllegalArgumentException](e.other("zz"))
  }

  test("JoinQuery rejects a non-permutation join order") {
    val g = JoinGraph(
      Seq(ref("a", "a_k", "a_v"), ref("b", "b_k", "b_v")),
      Seq(JoinEdge("a", Seq("a_k"), "b", Seq("b_k"))))
    assertThrows[IllegalArgumentException](JoinQuery(g, Seq("a")))
    assertThrows[IllegalArgumentException](JoinQuery(g, Seq("a", "b", "c")))
  }

  test("JoinQuery rejects a disconnected join order") {
    val g = JoinGraph(
      Seq(ref("a", "a_k", "a_v"), ref("b", "b_k", "b_v"), ref("c", "c_k", "c_v")),
      Seq(JoinEdge("a", Seq("a_k"), "b", Seq("b_k")),
          JoinEdge("b", Seq("b_v"), "c", Seq("c_k"))))
    // c does not join directly with a, so [a, c, b] needs a cross product
    assertThrows[IllegalArgumentException](JoinQuery(g, Seq("a", "c", "b")))
    JoinQuery(g, Seq("a", "b", "c")) // fine
  }

  test("TableRef rejects empty names and negative estimates") {
    assertThrows[IllegalArgumentException](ref("", "k", "v"))
    assertThrows[IllegalArgumentException](
      TableRef("a", Seq(1L).toDF("k"), -1L))
  }

  test("TableRef.filtered applies the local predicate") {
    import org.apache.spark.sql.functions.col
    val r = TableRef("a", Seq(1L, 2L, 3L).toDF("k"), 3L, Some(col("k") > 1))
    assert(r.filtered.count() == 2L)
    assert(r.copy(localFilter = None).filtered.count() == 3L)
  }
}
