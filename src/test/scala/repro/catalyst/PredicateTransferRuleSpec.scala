package repro.catalyst

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.scalatest.BeforeAndAfterEach
import repro.{Oracle, SparkSpec, TestData}

/** The Catalyst semi-join-reduction rule: gated, correct, idempotent. */
class PredicateTransferRuleSpec extends SparkSpec with BeforeAndAfterEach {

  private lazy val t = TestData.tpch

  override def beforeAll(): Unit = {
    super.beforeAll()
    PredicateTransferExtensions.install(spark)
  }

  override def afterEach(): Unit = {
    spark.conf.set(PredicateTransferRule.EnabledKey, "false")
    super.afterEach()
  }

  private def enable(): Unit =
    spark.conf.set(PredicateTransferRule.EnabledKey, "true")

  /** Q5 written directly against the DataFrame API (the shape a user query
    * takes before the rule sees it).
    */
  private def q5Df: DataFrame =
    t.customer.join(t.orders, col("c_custkey") === col("o_custkey"))
      .join(t.lineitem, col("l_orderkey") === col("o_orderkey"))
      .join(t.supplier,
        col("l_suppkey") === col("s_suppkey") && col("c_nationkey") === col("s_nationkey"))
      .join(t.nation, col("s_nationkey") === col("n_nationkey"))
      .join(t.region, col("n_regionkey") === col("r_regionkey"))
      .filter(col("r_name") === "ASIA" &&
        col("o_orderdate") >= "1994-01-01" && col("o_orderdate") < "1995-01-01")
      .groupBy("n_name")
      .agg(sum((col("l_extendedprice") * (lit(1) - col("l_discount")))
        .cast("decimal(18,4)")).as("revenue"))

  private def q3Df: DataFrame =
    t.customer.filter(col("c_mktsegment") === "BUILDING")
      .join(t.orders.filter(col("o_orderdate") < "1995-03-15"),
        col("c_custkey") === col("o_custkey"))
      .join(t.lineitem.filter(col("l_shipdate") > "1995-03-15"),
        col("o_orderkey") === col("l_orderkey"))
      .groupBy("l_orderkey")
      .agg(sum((col("l_extendedprice") * (lit(1) - col("l_discount")))
        .cast("decimal(18,4)")).as("revenue"))

  private def optimizedPlan(df: DataFrame): String =
    df.queryExecution.optimizedPlan.toString

  test("rule is a no-op while disabled") {
    val plan = optimizedPlan(q5Df)
    assert(!plan.contains("LeftSemi"), "disabled rule must not inject semi joins")
  }

  test("enabled rule injects LeftSemi reductions into a multi-join plan") {
    enable()
    val plan = optimizedPlan(q5Df)
    assert(plan.contains("LeftSemi"), s"expected semi-join reductions in:\n$plan")
    assert(plan.contains(PredicateTransferRule.Marker))
  }

  test("rewritten Q5 matches the DuckDB oracle") {
    enable()
    Oracle.assertEquivalent(
      q5Df,
      """SELECT n_name,
        |  SUM(CAST(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)) AS DECIMAL(18,4))) AS revenue
        |FROM customer, orders, lineitem, supplier, nation, region
        |WHERE c_custkey = o_custkey AND l_orderkey = o_orderkey
        |  AND l_suppkey = s_suppkey AND c_nationkey = s_nationkey
        |  AND s_nationkey = n_nationkey AND n_regionkey = r_regionkey
        |  AND r_name = 'ASIA'
        |  AND o_orderdate >= '1994-01-01' AND o_orderdate < '1995-01-01'
        |GROUP BY n_name""".stripMargin,
      t.oracleTables(Seq("customer", "orders", "lineitem",
        "supplier", "nation", "region")): _*)
  }

  test("rewritten Q3 equals the unrewritten result") {
    val plain = TestData.canon(q3Df)
    enable()
    assert(TestData.canon(q3Df) == plain)
  }

  test("rewritten plan result is stable for a cyclic 3-table query") {
    val df = t.customer
      .join(t.orders, col("c_custkey") === col("o_custkey"))
      .join(t.supplier, col("c_nationkey") === col("s_nationkey"))
      .filter(col("o_orderdate") < "1992-02-01" && col("s_suppkey") <= 10)
      .agg(count(lit(1)).as("n"))
    val plain = df.head.getLong(0)
    enable()
    assert(df.head.getLong(0) == plain)
  }

  test("rule is idempotent under the fixed-point optimizer batch") {
    enable()
    // The reduced leaves nest each other's plans, so the *textual* LeftSemi
    // count exceeds the number of reduction steps; what must hold is that
    // the count is (a) bounded (the fixed-point batch did not keep adding
    // reductions on every iteration) and (b) stable across compilations.
    val c1 = "LeftSemi".r.findAllIn(optimizedPlan(q3Df)).size
    val c2 = "LeftSemi".r.findAllIn(optimizedPlan(q3Df)).size
    assert(c1 >= 1 && c1 == c2, s"unstable rewrite: $c1 vs $c2")
    assert(c1 <= 20, s"runaway fixed point: $c1 LeftSemi joins")
  }

  test("two-table join is rewritten and stays correct") {
    enable()
    val df = t.orders.join(t.customer, col("o_custkey") === col("c_custkey"))
      .filter(col("c_mktsegment") === "BUILDING")
      .agg(count(lit(1)).as("n"))
    val n = df.head.getLong(0)
    spark.conf.set(PredicateTransferRule.EnabledKey, "false")
    assert(df.head.getLong(0) == n)
  }

  test("non-equi-only join trees are left untouched") {
    enable()
    val df = t.nation.join(t.region, col("n_regionkey") < col("r_regionkey"))
    assert(!optimizedPlan(df).contains("LeftSemi"))
  }

  test("outer joins are not flattened into the transfer graph") {
    enable()
    val df = t.nation.join(t.region,
      col("n_regionkey") === col("r_regionkey"), "left_outer")
    assert(!optimizedPlan(df).contains("LeftSemi"))
  }

  test("install is idempotent on a shared session") {
    PredicateTransferExtensions.install(spark)
    PredicateTransferExtensions.install(spark)
    val classic = spark.asInstanceOf[org.apache.spark.sql.classic.SparkSession]
    assert(classic.experimental.extraOptimizations
      .count(_ == PredicateTransferRule) == 1)
  }
}
