package repro

import org.apache.spark.sql.{DataFrame, Row}
import repro.tpch.TpchLite

/** Shared test fixtures: one cached TPC-H-lite instance per scale factor for
  * the whole forked test JVM (suites run sequentially on one SparkSession).
  */
object TestData {
  /** Unit/integration-test dataset (~10 MB). */
  lazy val tpch: TpchLite = TpchLite(SparkSpec.shared, 0.01).cached()

  /** Canonicalize a DataFrame for engine-independent row equality — the same
    * normalization as [[Oracle]] (columns sorted by name, doubles/decimals at
    * 1e-6, rows sorted), for comparing two Spark plans to each other.
    */
  def canon(df: DataFrame): Seq[Seq[String]] = {
    val cols = df.columns.toSeq
    val order = cols.sorted.map(cols.indexOf)
    df.collect().toSeq
      .map(r => order.map { i =>
        r.get(i) match {
          case null                     => "∅"
          case d: Double                => f"$d%.6f"
          case f: Float                 => f"${f.toDouble}%.6f"
          case bd: java.math.BigDecimal => f"${bd.doubleValue}%.6f"
          case x                        => x.toString
        }
      })
      .sortBy(_.mkString(""))
  }

  /** Assert two DataFrames hold the same multiset of rows (canonicalized). */
  def assertSameRows(got: DataFrame, expected: DataFrame, hint: String = ""): Unit = {
    val g = canon(got); val e = canon(expected)
    assert(g == e,
      s"$hint row mismatch (${g.size} vs ${e.size}):\n" +
        s"  got-only: ${g.diff(e).take(3)}\n  exp-only: ${e.diff(g).take(3)}")
  }
}
