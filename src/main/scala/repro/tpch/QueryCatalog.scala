package repro.tpch

import repro.tpch.queries._

/** The reproduced TPC-H-lite query suite (see DESIGN.md §1, substitution 3:
  * Q1/Q6 are join-free and excluded by the paper; the remaining omissions
  * need operators outside the evaluated inner-join workload).
  */
object QueryCatalog {
  val all: Seq[LiteQuery] =
    Seq(Q2, Q3, Q5, Q7, Q8, Q9, Q10, Q11, Q12, Q14, Q17, Q18, Q19)

  def byName(name: String): LiteQuery = all.find(_.name == name).getOrElse(
    throw new IllegalArgumentException(
      s"unknown query $name (have: ${all.map(_.name).mkString(", ")})"))

  /** Queries joining ≥ 4 tables — where the paper reports the big speedups. */
  val multiJoin: Seq[LiteQuery] = Seq(Q2, Q5, Q7, Q8, Q9, Q10, Q18)
}
