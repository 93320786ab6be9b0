package repro.core

/** The join graph of a query: one vertex per [[TableRef]], one [[JoinEdge]]
  * per equi-join. Validated eagerly so a malformed query spec fails at
  * construction, not deep inside a Spark job.
  */
final case class JoinGraph(tables: Seq[TableRef], edges: Seq[JoinEdge]) {
  require(tables.nonEmpty, "join graph needs at least one table")

  /** Tables by name. */
  val byName: Map[String, TableRef] = tables.map(t => t.name -> t).toMap
  require(byName.size == tables.size,
    s"duplicate table names: ${tables.map(_.name).diff(byName.keys.toSeq).distinct}")

  // Every edge endpoint must be a declared table and every key an actual column.
  edges.foreach { e =>
    for ((t, keys) <- Seq(e.left -> e.leftKeys, e.right -> e.rightKeys)) {
      val ref = byName.getOrElse(t,
        throw new IllegalArgumentException(s"edge references unknown table $t"))
      val cols = ref.df.columns.toSet
      val missing = keys.filterNot(cols)
      require(missing.isEmpty, s"table $t lacks join key column(s) $missing")
    }
  }

  // Join-phase intermediates concatenate columns of all joined tables, so
  // column names must be globally unique across the query's tables.
  {
    val dup = tables.flatMap(t => t.df.columns.map(_ -> t.name))
      .groupBy(_._1).filter(_._2.size > 1)
    require(dup.isEmpty,
      s"column names shared across tables (rename/alias them): " +
        dup.map { case (c, ts) => s"$c in ${ts.map(_._2).mkString("/")}" }.mkString(", "))
  }

  /** All edges touching `table`. */
  def edgesOf(table: String): Seq[JoinEdge] = edges.filter(_.touches(table))

  /** Neighbour table names of `table`. */
  def neighbours(table: String): Set[String] = edgesOf(table).map(_.other(table)).toSet

  /** Whether the graph is connected (ignoring edge direction). */
  def isConnected: Boolean = {
    if (tables.size <= 1) return true
    var seen = Set(tables.head.name)
    var frontier = List(tables.head.name)
    while (frontier.nonEmpty) {
      val next = frontier.flatMap(neighbours).filterNot(seen)
      seen ++= next
      frontier = next
    }
    seen.size == tables.size
  }
}
