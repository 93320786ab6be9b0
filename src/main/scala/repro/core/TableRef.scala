package repro.core

import org.apache.spark.sql.{Column, DataFrame}

/** One input table of a join query.
  *
  * @param name        unique name inside the query (self-joins use two refs
  *                    with renamed columns, e.g. `n1` / `n2`)
  * @param df          the table; its column names must be disjoint from every
  *                    other ref in the query so join-phase intermediates stay
  *                    unambiguous
  * @param estRows     catalog-style base row estimate — drives the
  *                    smaller→bigger transfer-graph orientation and Bloom
  *                    filter sizing, exactly like the paper's heuristic
  * @param localFilter the table-local predicate from the query (the paper's
  *                    "inherent filter"), applied before any transfer
  */
final case class TableRef(
    name: String,
    df: DataFrame,
    estRows: Long,
    localFilter: Option[Column] = None,
) {
  require(name.nonEmpty, "table name must be non-empty")
  require(estRows >= 0, s"estRows must be >= 0 for $name")

  /** The table with its local predicate applied (identity if none). */
  def filtered: DataFrame = localFilter.fold(df)(df.filter)
}
