package repro.core

/** An undirected equi-join edge of the join graph.
  *
  * Semantics: `left.leftKeys(i) = right.rightKeys(i)` for every i, AND-ed.
  * Composite keys (e.g. lineitem↔partsupp on (partkey, suppkey)) are one
  * edge with two key pairs.
  */
final case class JoinEdge(
    left: String,
    leftKeys: Seq[String],
    right: String,
    rightKeys: Seq[String],
) {
  require(leftKeys.nonEmpty, s"edge $left↔$right has no keys")
  require(leftKeys.size == rightKeys.size,
    s"edge $left↔$right has mismatched key arity: $leftKeys vs $rightKeys")
  require(left != right, s"self-loop edge on $left — alias the table twice instead")

  /** The two endpoints. */
  def tables: Set[String] = Set(left, right)

  /** Whether this edge touches `table`. */
  def touches(table: String): Boolean = left == table || right == table

  /** The keys on `table`'s side of the edge. */
  def keysOf(table: String): Seq[String] =
    if (table == left) leftKeys
    else if (table == right) rightKeys
    else throw new IllegalArgumentException(s"$table is not an endpoint of $left↔$right")

  /** The keys on the side opposite to `table`. */
  def keysOpposite(table: String): Seq[String] = keysOf(other(table))

  /** The endpoint that is not `table`. */
  def other(table: String): String =
    if (table == left) right
    else if (table == right) left
    else throw new IllegalArgumentException(s"$table is not an endpoint of $left↔$right")
}
