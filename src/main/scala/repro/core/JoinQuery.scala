package repro.core

import org.apache.spark.sql.{Column, DataFrame}

/** A declarative multi-join query: the join graph plus how to execute and
  * finish it.
  *
  * @param graph          tables + equi-join edges
  * @param joinOrder      left-deep join order — the first table is the initial
  *                       probe side, each following table is the build side of
  *                       one join step (every prefix must stay connected)
  * @param postJoinFilter residual predicate over the fully-joined row (non-equi
  *                       or cross-table conditions, e.g. Q17's `l_quantity <
  *                       threshold` or Q7's nation-pair disjunction)
  * @param finish       projection/aggregation/sort applied to the joined
  *                       (and residual-filtered) DataFrame
  */
final case class JoinQuery(
    graph: JoinGraph,
    joinOrder: Seq[String],
    postJoinFilter: Option[Column] = None,
    finish: DataFrame => DataFrame = identity,
) {
  require(joinOrder.toSet == graph.tables.map(_.name).toSet,
    s"joinOrder ${joinOrder} must be a permutation of the graph's tables " +
      s"${graph.tables.map(_.name)}")

  // Each table after the first must join with at least one earlier table,
  // otherwise the left-deep plan would need a cross product.
  joinOrder.tail.zipWithIndex.foreach { case (t, i) =>
    val prefix = joinOrder.take(i + 1).toSet
    require(graph.edgesOf(t).exists(e => prefix.contains(e.other(t))),
      s"joinOrder is not connected: $t shares no edge with ${prefix.mkString(",")}")
  }

  /** The same query with a different left-deep join order (robustness runs). */
  def withJoinOrder(order: Seq[String]): JoinQuery = copy(joinOrder = order)
}
