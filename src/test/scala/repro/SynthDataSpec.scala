package repro

import org.apache.spark.sql.functions._

/** Generator invariants the reproduction relies on: sizes, key domains,
  * referential integrity, determinism.
  */
class SynthDataSpec extends SparkSpec {
  private val sf = 0.01
  private def t = TestData.tpch

  test("row counts match the catalog at SF 0.01") {
    assert(t.lineitem.count() == 60000L)
    assert(t.orders.count() == 15000L)
    assert(t.customer.count() == 1500L)
    assert(t.part.count() == 2000L)
    assert(t.supplier.count() == 100L)
    assert(t.partsupp.count() == 8000L)
    assert(t.nation.count() == 25L)
    assert(t.region.count() == 5L)
  }

  test("SynthData.rows agrees with generated sizes") {
    for (name <- Seq("lineitem", "orders", "customer", "part",
                     "supplier", "partsupp", "nation", "region"))
      assert(SynthData.rows(name, sf) == t.byName(name).count(), name)
  }

  test("SynthData.rows rejects unknown tables") {
    assertThrows[IllegalArgumentException](SynthData.rows("nope", 1.0))
  }

  test("lineitem foreign keys stay in their domains") {
    val r = t.lineitem.agg(
      min("l_orderkey"), max("l_orderkey"),
      min("l_partkey"), max("l_partkey"),
      min("l_suppkey"), max("l_suppkey")).head
    assert(r.getLong(0) >= 1 && r.getLong(1) <= SynthData.rows("orders", sf))
    assert(r.getLong(2) >= 1 && r.getLong(3) <= SynthData.rows("part", sf))
    assert(r.getLong(4) >= 1 && r.getLong(5) <= SynthData.rows("supplier", sf))
  }

  test("orders custkey stays in customer domain") {
    val r = t.orders.agg(min("o_custkey"), max("o_custkey")).head
    assert(r.getLong(0) >= 1 && r.getLong(1) <= SynthData.rows("customer", sf))
  }

  test("customer and supplier nation keys cover 0..24") {
    val c = t.customer.agg(min("c_nationkey"), max("c_nationkey")).head
    assert(c.getInt(0) >= 0 && c.getInt(1) <= 24)
    val s = t.supplier.agg(min("s_nationkey"), max("s_nationkey")).head
    assert(s.getInt(0) >= 0 && s.getInt(1) <= 24)
  }

  test("nation has 25 rows across 5 regions with 5 nations each") {
    val byRegion = t.nation.groupBy("n_regionkey").count().collect()
    assert(byRegion.length == 5)
    assert(byRegion.forall(_.getLong(1) == 5L))
  }

  test("region names are the five TPC-H regions") {
    val names = t.region.select("r_name").collect().map(_.getString(0)).toSet
    assert(names == Set("AFRICA", "AMERICA", "ASIA", "EUROPE", "MIDDLE EAST"))
  }

  test("nation→region mapping includes the classic fixtures") {
    val asia = t.nation.join(t.region,
        col("n_regionkey") === col("r_regionkey"))
      .filter(col("r_name") === "ASIA")
      .select("n_name").collect().map(_.getString(0)).toSet
    assert(asia == Set("INDIA", "INDONESIA", "JAPAN", "CHINA", "VIETNAM"))
  }

  test("partsupp has exactly SuppliersPerPart rows per part, all pairs unique") {
    val perPart = t.partsupp.groupBy("ps_partkey").count()
      .agg(min("count"), max("count")).head
    assert(perPart.getLong(0) == SynthData.SuppliersPerPart.toLong)
    assert(perPart.getLong(1) == SynthData.SuppliersPerPart.toLong)
    val pairs = t.partsupp.select("ps_partkey", "ps_suppkey").distinct().count()
    assert(pairs == t.partsupp.count())
  }

  test("every lineitem (partkey, suppkey) pair exists in partsupp") {
    val dangling = t.lineitem.select("l_partkey", "l_suppkey")
      .join(t.partsupp,
        col("l_partkey") === col("ps_partkey") && col("l_suppkey") === col("ps_suppkey"),
        "left_anti")
      .count()
    assert(dangling == 0L, s"$dangling lineitem rows reference no partsupp pair")
  }

  test("lineitem generation is deterministic in (sf, seed)") {
    val h = (df: org.apache.spark.sql.DataFrame) =>
      df.agg(sum(xxhash64(col("l_orderkey"), col("l_partkey"), col("l_suppkey"),
        col("l_extendedprice")).cast("decimal(38,0)"))).head.getDecimal(0)
    assert(h(SynthData.lineitem(spark, 0.002)) == h(SynthData.lineitem(spark, 0.002)))
  }

  test("orders generation is deterministic in (sf, seed)") {
    val h = (df: org.apache.spark.sql.DataFrame) =>
      df.agg(sum(xxhash64(col("o_orderkey"), col("o_custkey"), col("o_orderdate"))
        .cast("decimal(38,0)"))).head.getDecimal(0)
    assert(h(SynthData.orders(spark, 0.002)) == h(SynthData.orders(spark, 0.002)))
  }

  test("p_brand values are the 25 Brand#MN combinations") {
    val brands = t.part.select("p_brand").distinct().collect().map(_.getString(0)).toSet
    assert(brands.subsetOf(
      (for (m <- 1 to 5; n <- 1 to 5) yield s"Brand#$m$n").toSet))
    assert(brands.size > 20) // at SF 0.01 all 25 combinations should appear
  }

  test("p_container values come from the 8-value domain") {
    val cs = t.part.select("p_container").distinct().collect().map(_.getString(0)).toSet
    assert(cs.subsetOf(Set("SM CASE", "SM BOX", "MED BOX", "MED BAG",
      "LG CASE", "LG BOX", "JUMBO PKG", "WRAP BAG")))
  }

  test("l_shipmode values come from the 7-value domain") {
    val ms = t.lineitem.select("l_shipmode").distinct().collect().map(_.getString(0)).toSet
    assert(ms == Set("MAIL", "SHIP", "AIR", "TRUCK", "RAIL", "FOB", "REG AIR"))
  }

  test("date columns span the TPC-H ranges") {
    val r = t.orders.agg(min("o_orderdate").cast("string"),
                         max("o_orderdate").cast("string")).head
    assert(r.getString(0) >= "1992-01-01" && r.getString(1) <= "1998-08-03")
    val l = t.lineitem.agg(min("l_shipdate").cast("string"),
                           max("l_shipdate").cast("string")).head
    assert(l.getString(0) >= "1992-01-01" && l.getString(1) <= "1999-01-01")
  }

  test("receiptdate is strictly after shipdate") {
    assert(t.lineitem.filter(col("l_receiptdate") <= col("l_shipdate")).count() == 0L)
  }

  test("zipf keys are skewed toward small ranks") {
    val z = SynthData.zipfKeys(spark, 10000, 100)
    val top = z.filter(col("k") === 1).count().toDouble / 10000
    assert(top > 0.2, s"rank-1 share $top should dominate under alpha=1.1")
  }

  test("uniform keys cover the domain roughly evenly") {
    val u = SynthData.uniformKeys(spark, 10000, 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.min > 500 && counts.max < 2000)
  }
}
