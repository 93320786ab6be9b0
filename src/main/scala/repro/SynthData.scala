package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic OLAP data at a configurable scale factor.
  *
  * SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
  * benchmarks use SF~=0.1. Generators are deterministic in (sf, seed) so
  * the DuckDB oracle sees identical input.
  *
  * This is "TPC-H-lite": all eight TPC-H tables with their keys and the
  * columns the reproduced queries touch. Referential integrity matches
  * dbgen where it matters for join selectivity — in particular every
  * lineitem `(l_partkey, l_suppkey)` pair is one of the four partsupp
  * suppliers of that part (see [[suppForPart]]), so composite-key joins
  * (TPC-H Q9 style) are non-degenerate.
  */
object SynthData {
  private val NLineitemPerSf = 6_000_000L
  private val NOrdersPerSf   = 1_500_000L
  private val NCustomerPerSf =   150_000L
  private val NPartPerSf     =   200_000L
  private val NSupplierPerSf =    10_000L
  val SuppliersPerPart       = 4

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  /** Base row counts at a scale factor (used for transfer-graph orientation
    * and Bloom filter sizing — the same numbers a catalog would expose).
    */
  def rows(table: String, sf: Double): Long = table match {
    case "lineitem" => n(NLineitemPerSf, sf)
    case "orders"   => n(NOrdersPerSf, sf)
    case "customer" => n(NCustomerPerSf, sf)
    case "part"     => n(NPartPerSf, sf)
    case "supplier" => n(NSupplierPerSf, sf)
    case "partsupp" => n(NPartPerSf, sf) * SuppliersPerPart
    case "nation"   => 25L
    case "region"   => 5L
    case other      => throw new IllegalArgumentException(s"unknown table: $other")
  }

  /** The i-th (0..3) supplier of part p among nSupp suppliers — dbgen-style
    * deterministic map shared by [[partsupp]] and [[lineitem]].
    */
  private def suppForPart(p: org.apache.spark.sql.Column, i: org.apache.spark.sql.Column,
                          nSupp: Long): org.apache.spark.sql.Column =
    ((p * 7 + i * 13) % nSupp + 1).cast(LongType)

  def lineitem(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    import spark.implicits._
    val nOrders = n(NOrdersPerSf, sf); val nPart = n(NPartPerSf, sf)
    val nSupp = n(NSupplierPerSf, sf)
    val lPartkey = (rand(seed + 1) * nPart + 1).cast(LongType)
    val shipdate = date_add(lit("1992-01-01").cast(DateType),
                            (rand(seed + 9) * 2557).cast("int"))
    spark.range(n(NLineitemPerSf, sf)).select(
      (rand(seed)     * nOrders + 1).cast(LongType)    as "l_orderkey",
      lPartkey                                         as "l_partkey",
      (rand(seed + 2) * 7 + 1).cast(IntegerType)       as "l_linenumber",
      (rand(seed + 3) * 50 + 1).cast(DoubleType)       as "l_quantity",
      round(rand(seed + 4) * 90000 + 900, 2)           as "l_extendedprice",
      round(rand(seed + 5) * 0.10, 2)                  as "l_discount",
      round(rand(seed + 6) * 0.08, 2)                  as "l_tax",
      element_at(array(lit("N"), lit("R"), lit("A")),
                 (rand(seed + 7) * 3 + 1).cast("int")) as "l_returnflag",
      element_at(array(lit("O"), lit("F")),
                 (rand(seed + 8) * 2 + 1).cast("int")) as "l_linestatus",
      shipdate                                         as "l_shipdate",
      suppForPart(lPartkey, (rand(seed + 10) * SuppliersPerPart).cast(LongType),
                  nSupp)                               as "l_suppkey",
      element_at(array(lit("MAIL"), lit("SHIP"), lit("AIR"), lit("TRUCK"),
                       lit("RAIL"), lit("FOB"), lit("REG AIR")),
                 (rand(seed + 11) * 7 + 1).cast("int")) as "l_shipmode",
      date_add(shipdate, (rand(seed + 12) * 60 - 30).cast("int")) as "l_commitdate",
      date_add(shipdate, (rand(seed + 13) * 30 + 1).cast("int"))  as "l_receiptdate",
    )
  }

  def orders(spark: SparkSession, sf: Double = 0.01, seed: Long = 1): DataFrame = {
    import spark.implicits._
    val nCust = n(NCustomerPerSf, sf)
    spark.range(1, n(NOrdersPerSf, sf) + 1).toDF("o_orderkey").select(
      $"o_orderkey",
      (rand(seed)     * nCust + 1).cast(LongType)             as "o_custkey",
      element_at(array(lit("O"), lit("F"), lit("P")),
                 (rand(seed + 1) * 3 + 1).cast("int"))         as "o_orderstatus",
      round(rand(seed + 2) * 500000 + 1000, 2)                 as "o_totalprice",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 3) * 2406).cast("int"))            as "o_orderdate",
    )
  }

  def customer(spark: SparkSession, sf: Double = 0.01, seed: Long = 2): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NCustomerPerSf, sf) + 1).toDF("c_custkey").select(
      $"c_custkey",
      (rand(seed) * 25).cast(IntegerType)                as "c_nationkey",
      round(rand(seed + 1) * 10000 - 1000, 2)            as "c_acctbal",
      element_at(array(lit("BUILDING"), lit("AUTOMOBILE"), lit("MACHINERY"),
                       lit("HOUSEHOLD"), lit("FURNITURE")),
                 (rand(seed + 2) * 5 + 1).cast("int"))   as "c_mktsegment",
    )
  }

  def part(spark: SparkSession, sf: Double = 0.01, seed: Long = 5): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NPartPerSf, sf) + 1).toDF("p_partkey").select(
      $"p_partkey",
      element_at(array(lit("STANDARD"), lit("SMALL"), lit("MEDIUM"),
                       lit("LARGE"), lit("ECONOMY"), lit("PROMO")),
                 (rand(seed) * 6 + 1).cast("int"))              as "p_type",
      (rand(seed + 1) * 50 + 1).cast(IntegerType)               as "p_size",
      round(lit(900.0) + ($"p_partkey" % 1000) / 10.0, 2)       as "p_retailprice",
      concat(lit("Brand#"),
             ((rand(seed + 2) * 5 + 1).cast("int")).cast(StringType),
             ((rand(seed + 3) * 5 + 1).cast("int")).cast(StringType)) as "p_brand",
      element_at(array(lit("SM CASE"), lit("SM BOX"), lit("MED BOX"),
                       lit("MED BAG"), lit("LG CASE"), lit("LG BOX"),
                       lit("JUMBO PKG"), lit("WRAP BAG")),
                 (rand(seed + 4) * 8 + 1).cast("int"))          as "p_container",
    )
  }

  def supplier(spark: SparkSession, sf: Double = 0.01, seed: Long = 7): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NSupplierPerSf, sf) + 1).toDF("s_suppkey").select(
      $"s_suppkey",
      (rand(seed) * 25).cast(IntegerType)     as "s_nationkey",
      round(rand(seed + 1) * 10000 - 1000, 2) as "s_acctbal",
    )
  }

  /** SuppliersPerPart rows per part; `(ps_partkey, ps_suppkey)` is unique as
    * long as nSupp does not divide 13, 26 or 39 (true for every SF >= 0.005).
    */
  def partsupp(spark: SparkSession, sf: Double = 0.01, seed: Long = 6): DataFrame = {
    import spark.implicits._
    val nSupp = n(NSupplierPerSf, sf)
    val p = (expr("id") / SuppliersPerPart).cast(LongType) + 1
    val i = expr("id") % SuppliersPerPart
    spark.range(n(NPartPerSf, sf) * SuppliersPerPart).select(
      p                                        as "ps_partkey",
      suppForPart(p, i, nSupp)                 as "ps_suppkey",
      (rand(seed) * 9999 + 1).cast(IntegerType) as "ps_availqty",
      round(rand(seed + 1) * 1000 + 1, 2)       as "ps_supplycost",
    )
  }

  /** The 25 TPC-H nations with the standard nation→region mapping. */
  def nation(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq(
      (0, "ALGERIA", 0), (1, "ARGENTINA", 1), (2, "BRAZIL", 1), (3, "CANADA", 1),
      (4, "EGYPT", 4), (5, "ETHIOPIA", 0), (6, "FRANCE", 3), (7, "GERMANY", 3),
      (8, "INDIA", 2), (9, "INDONESIA", 2), (10, "IRAN", 4), (11, "IRAQ", 4),
      (12, "JAPAN", 2), (13, "JORDAN", 4), (14, "KENYA", 0), (15, "MOROCCO", 0),
      (16, "MOZAMBIQUE", 0), (17, "PERU", 1), (18, "CHINA", 2), (19, "ROMANIA", 3),
      (20, "SAUDI ARABIA", 4), (21, "VIETNAM", 2), (22, "RUSSIA", 3),
      (23, "UNITED KINGDOM", 3), (24, "UNITED STATES", 1),
    ).toDF("n_nationkey", "n_name", "n_regionkey")
  }

  /** The 5 TPC-H regions. */
  def region(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq((0, "AFRICA"), (1, "AMERICA"), (2, "ASIA"), (3, "EUROPE"), (4, "MIDDLE EAST"))
      .toDF("r_regionkey", "r_name")
  }

  /** Skewed key column — for join-skew / cardinality-estimation papers. */
  def zipfKeys(spark: SparkSession, rows: Long, nKeys: Long,
               alpha: Double = 1.1, seed: Long = 3): DataFrame = {
    import spark.implicits._
    // Inverse-CDF draw over rank weights 1/k^alpha; good enough for skew.
    val norm = (1L to math.min(nKeys, 10000L)).map(k => 1.0 / math.pow(k, alpha)).sum
    spark.range(rows).select(
      least(lit(nKeys),
            greatest(lit(1L),
              pow(lit(1.0) / (rand(seed) * norm + 1e-9), lit(1.0 / alpha)).cast(LongType)
            )) as "k",
      rand(seed + 1) as "v",
    )
  }

  def uniformKeys(spark: SparkSession, rows: Long, nKeys: Long, seed: Long = 4): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed) * nKeys + 1).cast(LongType) as "k",
      rand(seed + 1)                          as "v",
    )
  }
}
