package repro.catalyst

import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.plans.{Inner, LeftSemi}
import org.apache.spark.sql.catalyst.plans.logical._
import org.apache.spark.sql.catalyst.rules.Rule

/** Predicate transfer as a Catalyst optimizer rule — the precise-filter
  * instantiation (paper §3.2 "Filter Type": a precise filter makes each
  * transfer a semi-join).
  *
  * The rule finds the topmost tree of inner joins, flattens it into a join
  * graph (relations = non-inner-join subplans, edges = attribute-equality
  * conjuncts between two relations), orients every edge from the smaller to
  * the bigger relation by plan statistics, and rewrites every relation leaf
  * into a chain of `LEFT SEMI` reductions following one forward and one
  * backward pass. The original join tree shape and conditions are preserved;
  * only the leaves change, so the rewrite is correct for inner equi-joins by
  * the semi-join reduction argument (removing rows that match no partner on
  * a join key cannot change an inner-join result).
  *
  * Gated off by default; enable per session with
  * `SET spark.repro.predicateTransfer.enabled=true`. Install via
  * [[PredicateTransferExtensions]] or `spark.experimental.extraOptimizations`.
  */
object PredicateTransferRule extends Rule[LogicalPlan] {

  /** Session conf key gating the rewrite (default: disabled). */
  val EnabledKey = "spark.repro.predicateTransfer.enabled"

  /** Suffix marking attributes introduced by this rule — used both to keep
    * injected attribute names readable and to make the rewrite idempotent
    * under the optimizer's fixed-point batch.
    */
  val Marker = "__pt_key"

  override def apply(plan: LogicalPlan): LogicalPlan = {
    if (conf.getConfString(EnabledKey, "false") != "true") return plan
    plan.transformDown {
      case j @ Join(_, _, Inner, _, _) if eligible(j) => rewrite(j)
    }
  }

  /** One relation (vertex) of the flattened join graph. */
  private final case class Vertex(plan: LogicalPlan, size: BigInt)

  private def flatten(p: LogicalPlan): (Seq[LogicalPlan], Seq[Expression]) = p match {
    case Join(l, r, Inner, cond, _) =>
      val (lv, lc) = flatten(l)
      val (rv, rc) = flatten(r)
      (lv ++ rv, lc ++ rc ++ cond.toSeq.flatMap(splitConjunctivePredicates))
    case other => (Seq(other), Nil)
  }

  private def splitConjunctivePredicates(e: Expression): Seq[Expression] = e match {
    case And(l, r) => splitConjunctivePredicates(l) ++ splitConjunctivePredicates(r)
    case other     => Seq(other)
  }

  private def alreadyRewritten(relations: Seq[LogicalPlan]): Boolean =
    relations.exists(_.exists {
      case a: Aggregate => a.aggregateExpressions.exists(_.name.endsWith(Marker))
      case _            => false
    })

  private def eligible(j: Join): Boolean = {
    val (relations, _) = flatten(j)
    relations.size >= 2 && !alreadyRewritten(relations)
  }

  /** An oriented semi-join reduction step: `to` keeps only rows whose
    * `toKeys` appear among `fromKeys` of the (already reduced) `from` side.
    */
  private final case class Edge(from: Int, fromKeys: Seq[Attribute],
                                to: Int, toKeys: Seq[Attribute])

  private def rewrite(root: Join): LogicalPlan = {
    val (relations, conjuncts) = flatten(root)
    val verts = relations.map(r => Vertex(r, r.stats.sizeInBytes))
    val attrToRel: Map[ExprId, Int] = relations.zipWithIndex.flatMap {
      case (r, i) => r.output.map(_.exprId -> i)
    }.toMap

    // Equi-join conjuncts between two distinct relations, grouped per
    // unordered relation pair (composite keys become one multi-key edge).
    val keyPairs = conjuncts.collect {
      case EqualTo(a: AttributeReference, b: AttributeReference)
          if attrToRel.contains(a.exprId) && attrToRel.contains(b.exprId) &&
            attrToRel(a.exprId) != attrToRel(b.exprId) &&
            a.dataType == b.dataType =>
        (attrToRel(a.exprId), a, attrToRel(b.exprId), b)
    }
    if (keyPairs.isEmpty) return root

    // Orient smaller → bigger (ties on index), the paper's heuristic; the
    // size order is then a valid topological order of the transfer DAG.
    val order = verts.indices.sortBy(i => (verts(i).size, i))
    val pos = order.zipWithIndex.toMap
    val edges = keyPairs
      .map { case (ri, a, rj, b) => if (pos(ri) <= pos(rj)) (ri, a, rj, b) else (rj, b, ri, a) }
      .groupBy { case (ri, _, rj, _) => (ri, rj) }
      .map { case ((ri, rj), ps) => Edge(ri, ps.map(_._2), rj, ps.map(_._4)) }
      .toSeq

    /** `plan` LEFT SEMI reduced by the distinct `srcKeys` of `src`. */
    def semiReduce(plan: LogicalPlan, keys: Seq[Attribute],
                   src: LogicalPlan, srcKeys: Seq[Attribute]): LogicalPlan = {
      // Aggregate gives DISTINCT keys under fresh exprIds (via Alias), so
      // the duplicated src subtree never leaks its attributes upward.
      val aliases = srcKeys.map(k => Alias(k, k.name + Marker)())
      val distinctKeys = Aggregate(srcKeys, aliases, src)
      val cond = keys.zip(distinctKeys.output)
        .map { case (k, s) => EqualTo(k, s) }
        .reduce[Expression](And(_, _))
      Join(plan, distinctKeys, LeftSemi, Some(cond), JoinHint.NONE)
    }

    def pass(startPlans: IndexedSeq[LogicalPlan], es: Seq[Edge],
             visit: Seq[Int]): IndexedSeq[LogicalPlan] = {
      val reduced = startPlans.toArray
      for (v <- visit) {
        for (e <- es if e.to == v)
          reduced(v) = semiReduce(reduced(v), e.toKeys, reduced(e.from), e.fromKeys)
        // after v is final, edges out of v will read reduced(v) when their
        // target is visited later in `visit`
      }
      reduced.toIndexedSeq
    }

    val forward = pass(relations.toIndexedSeq, edges, order)
    val backward = pass(forward, edges.map(e => Edge(e.to, e.toKeys, e.from, e.fromKeys)),
                        order.reverse)

    // Rebuild the original join tree, replacing the i-th leaf (in flatten
    // order) with its reduced plan.
    var leaf = -1
    def rebuild(p: LogicalPlan): LogicalPlan = p match {
      case j @ Join(l, r, Inner, _, _) =>
        val nl = rebuild(l)
        val nr = rebuild(r)
        j.copy(left = nl, right = nr)
      case _ =>
        leaf += 1
        backward(leaf)
    }
    rebuild(root)
  }
}
