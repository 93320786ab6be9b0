package repro.tpch

import repro.{SparkSpec, TestData}
import repro.core.TransferGraph

/** Structural sanity of every query spec: builds cleanly, connected graph,
  * orientation is well-formed, oracle table names are real tables.
  */
class QuerySpecValidationSpec extends SparkSpec {

  private lazy val t = TestData.tpch

  for (q <- QueryCatalog.all) {
    test(s"${q.name}: spec builds and the join graph is connected") {
      val jq = q.build(t)
      assert(jq.graph.tables.nonEmpty)
      assert(jq.graph.isConnected, s"${q.name} join graph must be connected")
    }

    test(s"${q.name}: orientation yields a DAG covering every edge") {
      val jq = q.build(t)
      val tg = TransferGraph.orient(jq.graph)
      val pos = tg.order.zipWithIndex.toMap
      assert(tg.edges.size == jq.graph.edges.size)
      tg.edges.foreach(e => assert(pos(e.from) <= pos(e.to)))
    }

    test(s"${q.name}: oracle table names are known base tables") {
      val known = t.byName.keySet
      assert(q.oracleTableNames.toSet.subsetOf(known),
        s"unknown oracle tables: ${q.oracleTableNames.filterNot(known)}")
      assert(q.oracleSql.trim.toUpperCase.startsWith("SELECT"))
    }
  }

  test("catalog names are unique and lookup works") {
    val names = QueryCatalog.all.map(_.name)
    assert(names.distinct.size == names.size)
    for (n <- names) assert(QueryCatalog.byName(n).name == n)
    assertThrows[IllegalArgumentException](QueryCatalog.byName("Q0"))
  }

  test("multiJoin subset really joins ≥ 4 tables") {
    for (q <- QueryCatalog.multiJoin)
      assert(q.build(t).graph.tables.size >= 4, q.name)
  }
}
