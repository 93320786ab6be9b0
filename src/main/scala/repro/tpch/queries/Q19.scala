package repro.tpch.queries

import org.apache.spark.sql.functions._
import repro.core._
import repro.tpch._
import repro.tpch.LiteQuery._

/** TPC-H Q19 (lite): a disjunctive cross-table predicate that cannot be
  * pushed into either table — a stress case where predicate transfer has
  * (almost) nothing to transfer and should neither help nor hurt much.
  */
object Q19 extends LiteQuery {
  override val name = "Q19"
  override val oracleTableNames = Seq("lineitem", "part")

  override def build(t: TpchLite): JoinQuery = {
    val graph = JoinGraph(
      tables = Seq(
        TableRef("lineitem",
          t.lineitem.select("l_partkey", "l_quantity", "l_extendedprice", "l_discount"),
          t.estRows("lineitem")),
        TableRef("part",
          t.part.select("p_partkey", "p_brand", "p_container", "p_size"),
          t.estRows("part")),
      ),
      edges = Seq(
        JoinEdge("lineitem", Seq("l_partkey"), "part", Seq("p_partkey")),
      ),
    )
    val branch1 = col("p_brand") === "Brand#12" &&
      col("p_container").isin("SM CASE", "SM BOX") &&
      col("l_quantity").between(1, 11) && col("p_size").between(1, 5)
    val branch2 = col("p_brand") === "Brand#23" &&
      col("p_container").isin("MED BAG", "MED BOX") &&
      col("l_quantity").between(10, 20) && col("p_size").between(1, 10)
    val branch3 = col("p_brand") === "Brand#34" &&
      col("p_container").isin("LG CASE", "LG BOX") &&
      col("l_quantity").between(20, 30) && col("p_size").between(1, 15)
    JoinQuery(
      graph,
      joinOrder = Seq("lineitem", "part"),
      postJoinFilter = Some(branch1 || branch2 || branch3),
      finish = _.agg(decSum(revenue).as("revenue")),
    )
  }

  override val oracleSql: String =
    s"""SELECT $duckRevenueSum AS revenue
       |FROM lineitem, part
       |WHERE l_partkey = p_partkey AND (
       |  (p_brand = 'Brand#12' AND p_container IN ('SM CASE', 'SM BOX')
       |    AND CAST(l_quantity AS DOUBLE) BETWEEN 1 AND 11
       |    AND CAST(p_size AS INT) BETWEEN 1 AND 5)
       |  OR
       |  (p_brand = 'Brand#23' AND p_container IN ('MED BAG', 'MED BOX')
       |    AND CAST(l_quantity AS DOUBLE) BETWEEN 10 AND 20
       |    AND CAST(p_size AS INT) BETWEEN 1 AND 10)
       |  OR
       |  (p_brand = 'Brand#34' AND p_container IN ('LG CASE', 'LG BOX')
       |    AND CAST(l_quantity AS DOUBLE) BETWEEN 20 AND 30
       |    AND CAST(p_size AS INT) BETWEEN 1 AND 15))""".stripMargin
}
