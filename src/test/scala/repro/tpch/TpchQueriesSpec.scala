package repro.tpch

import repro.{Oracle, SparkSpec, TestData}
import repro.core.Strategy

/** End-to-end correctness of every TPC-H-lite query under every strategy at
  * SF 0.01.
  *
  * No-Pred-Trans and Pred-Trans are checked directly against DuckDB (the
  * oracle); Bloom Join and Yannakakis are checked row-for-row against the
  * oracle-verified No-Pred-Trans output (equivalent coverage at a fraction
  * of the JDBC-insert cost).
  */
class TpchQueriesSpec extends SparkSpec {

  private lazy val t = TestData.tpch

  for (q <- QueryCatalog.all) {
    test(s"${q.name}: No-Pred-Trans matches the DuckDB oracle") {
      Oracle.assertEquivalent(
        q.execute(t, Strategy.NoPredTrans),
        q.oracleSql,
        t.oracleTables(q.oracleTableNames): _*)
    }

    test(s"${q.name}: Pred-Trans matches the DuckDB oracle") {
      Oracle.assertEquivalent(
        q.execute(t, Strategy.PredTrans),
        q.oracleSql,
        t.oracleTables(q.oracleTableNames): _*)
    }

    test(s"${q.name}: Bloom Join matches No-Pred-Trans") {
      TestData.assertSameRows(
        q.execute(t, Strategy.BloomJoin),
        q.execute(t, Strategy.NoPredTrans),
        q.name)
    }

    test(s"${q.name}: Yannakakis matches No-Pred-Trans") {
      TestData.assertSameRows(
        q.execute(t, Strategy.Yannakakis),
        q.execute(t, Strategy.NoPredTrans),
        q.name)
    }
  }
}
