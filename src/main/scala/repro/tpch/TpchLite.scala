package repro.tpch

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.SynthData

/** One TPC-H-lite dataset instance at a scale factor: the eight tables plus
  * catalog-style base row counts (which drive the smaller→bigger transfer
  * heuristic and Bloom sizing, like table statistics would in a DBMS).
  */
final case class TpchLite(
    spark: SparkSession,
    sf: Double,
    lineitem: DataFrame,
    orders: DataFrame,
    customer: DataFrame,
    part: DataFrame,
    supplier: DataFrame,
    partsupp: DataFrame,
    nation: DataFrame,
    region: DataFrame,
) {
  /** All tables keyed by TPC-H name. */
  def byName: Map[String, DataFrame] = Map(
    "lineitem" -> lineitem, "orders" -> orders, "customer" -> customer,
    "part" -> part, "supplier" -> supplier, "partsupp" -> partsupp,
    "nation" -> nation, "region" -> region)

  /** Catalog row estimate for a base table. */
  def estRows(table: String): Long = SynthData.rows(table, sf)

  /** Name→DataFrame pairs for `Oracle.assertEquivalent` registration. */
  def oracleTables(names: Seq[String]): Seq[(String, DataFrame)] =
    names.map(n => n -> byName(n))

  /** Persist and force all tables (benchmarks measure warm in-memory runs,
    * like the paper's second-run measurement).
    */
  def cached(): TpchLite = {
    val c = copy(
      lineitem = lineitem.persist(), orders = orders.persist(),
      customer = customer.persist(), part = part.persist(),
      supplier = supplier.persist(), partsupp = partsupp.persist(),
      nation = nation.persist(), region = region.persist())
    c.byName.values.foreach(_.count())
    c
  }

  /** Release caches created by [[cached]]. */
  def uncache(): Unit = byName.values.foreach(_.unpersist(blocking = false))
}

object TpchLite {
  /** Generate the dataset at `sf` (deterministic in sf). */
  def apply(spark: SparkSession, sf: Double): TpchLite = TpchLite(
    spark, sf,
    lineitem = SynthData.lineitem(spark, sf),
    orders = SynthData.orders(spark, sf),
    customer = SynthData.customer(spark, sf),
    part = SynthData.part(spark, sf),
    supplier = SynthData.supplier(spark, sf),
    partsupp = SynthData.partsupp(spark, sf),
    nation = SynthData.nation(spark),
    region = SynthData.region(spark),
  )
}
