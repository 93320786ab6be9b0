package repro.core

import org.apache.spark.sql.DataFrame
import scala.collection.mutable

/** The join phase (paper §3.3): execute the query's left-deep join order
  * over the (possibly reduced) input tables, with two optional behaviours:
  *
  *  - `inlineBloom` — the paper's *Bloom Join* baseline: at every join step
  *    the build side constructs a Bloom filter on the step's join keys and
  *    the probe side (the running intermediate) is filtered through it
  *    before the join. This is exactly one-hop, one-direction transfer.
  *  - `metrics` — count build-side (HT) and probe-side (PR) input rows at
  *    every step, producing the paper's Table 1. The running intermediate
  *    is persisted per step so counting does not re-execute the prefix.
  */
object JoinPhase {

  def execute(
      query: JoinQuery,
      reduced: Map[String, DataFrame],
      inlineBloom: Option[FilterBuilder] = None,
      metrics: Option[ExecMetrics] = None,
      collectStepSizes: Boolean = false,
  ): DataFrame = {
    val g = query.graph
    val persisted = mutable.ArrayBuffer.empty[DataFrame]

    var cur = reduced(query.joinOrder.head)
    var joined = Set(query.joinOrder.head)

    for (next <- query.joinOrder.tail) {
      val stepEdges = g.edgesOf(next).filter(e => joined.contains(e.other(next)))
      require(stepEdges.nonEmpty, s"no edge connects $next to ${joined.mkString(",")}")
      var build = reduced(next)

      // Bloom Join: build-side filter applied to the probe intermediate.
      inlineBloom.foreach { builder =>
        for (e <- stepEdges) {
          val f = metrics.fold(
            builder.build(build, e.keysOf(next), g.byName(next).estRows))(
            _.timeTransfer(builder.build(build, e.keysOf(next), g.byName(next).estRows)))
          cur = f.applyTo(cur, e.keysOpposite(next))
        }
      }

      if (collectStepSizes) {
        val buildRows = build.count()
        val p = cur.persist(); persisted += p
        val probeRows = p.count()
        cur = p
        metrics.foreach(m => m.steps += StepMetric(m.steps.size + 1, next, buildRows, probeRows))
      }

      val cond = stepEdges.flatMap { e =>
        e.keysOpposite(next).zip(e.keysOf(next)).map { case (lk, rk) =>
          cur(lk) === build(rk)
        }
      }.reduce(_ && _)
      cur = cur.join(build, cond, "inner")
      joined += next
    }

    val filtered = query.postJoinFilter.fold(cur)(cur.filter)
    val result = query.finish(filtered)
    if (collectStepSizes) {
      // Materialize before unpersisting so step caches are actually used.
      metrics.foreach(_.resultRows = result.count())
      persisted.foreach(_.unpersist(blocking = false))
    }
    result
  }
}
