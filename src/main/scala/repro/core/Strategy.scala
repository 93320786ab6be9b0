package repro.core

/** The four execution strategies compared in the paper's evaluation (§4.1). */
sealed abstract class Strategy(val name: String) {
  override def toString: String = name
}

object Strategy {
  /** Local predicates only; pairs of tables joined regularly. */
  case object NoPredTrans extends Strategy("No-Pred-Trans")

  /** One-hop transfer: each join's build side Bloom-filters its probe side. */
  case object BloomJoin extends Strategy("Bloom Join")

  /** Semi-join phase over a BFS join tree, then regular joins. */
  case object Yannakakis extends Strategy("Yannakakis")

  /** The paper's contribution: Bloom-filter predicate transfer over the
    * full join graph (forward + backward pass), then regular joins.
    */
  case object PredTrans extends Strategy("Pred-Trans")

  val all: Seq[Strategy] = Seq(NoPredTrans, BloomJoin, Yannakakis, PredTrans)

  def byName(n: String): Strategy = all.find(_.name == n).getOrElse(
    throw new IllegalArgumentException(s"unknown strategy $n (valid: ${all.mkString(", ")})"))
}
