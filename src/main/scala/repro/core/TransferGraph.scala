package repro.core

/** A join edge oriented for predicate transfer: filters flow `from` → `to`. */
final case class DirectedEdge(
    from: String,
    fromKeys: Seq[String],
    to: String,
    toKeys: Seq[String],
) {
  /** The same edge with direction flipped (used by the backward pass). */
  def reversed: DirectedEdge = DirectedEdge(to, toKeys, from, fromKeys)
}

/** The predicate transfer graph (paper §3.2): a directed version of the join
  * graph, built with the paper's heuristic — every edge points from the
  * smaller table to the bigger table, no edge is dropped. Because the
  * direction follows a total order on tables, the result is a DAG for *any*
  * join graph topology (including cyclic ones like Q5/Q9), and the size
  * order itself is a topological order.
  */
final case class TransferGraph(order: Seq[String], edges: Seq[DirectedEdge]) {

  /** Edges leaving `table`. */
  def outgoing(table: String): Seq[DirectedEdge] = edges.filter(_.from == table)

  /** Edges entering `table`. */
  def incoming(table: String): Seq[DirectedEdge] = edges.filter(_.to == table)

  /** The reverse graph used by the backward pass: all edges flipped, nodes
    * visited biggest-first.
    */
  def reversed: TransferGraph = TransferGraph(order.reverse, edges.map(_.reversed))
}

object TransferGraph {

  /** Orient `graph` with the smaller→bigger heuristic. Ties break on table
    * name so the orientation is deterministic.
    */
  def orient(graph: JoinGraph): TransferGraph = {
    val order = graph.tables.sortBy(t => (t.estRows, t.name)).map(_.name)
    val pos = order.zipWithIndex.toMap
    val directed = graph.edges.map { e =>
      if (pos(e.left) <= pos(e.right))
        DirectedEdge(e.left, e.leftKeys, e.right, e.rightKeys)
      else
        DirectedEdge(e.right, e.rightKeys, e.left, e.leftKeys)
    }
    TransferGraph(order, directed)
  }
}
