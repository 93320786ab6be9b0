package repro.harness

import repro.core._
import repro.tpch.{QueryCatalog, TpchLite}

/** Reproduces **Figure 4** (in table form): Q5 runtime under three different
  * left-deep join orders per strategy. The paper's claim: Pred-Trans is both
  * fastest and the least sensitive to the join order (it inherits the
  * Yannakakis property of bounded intermediate sizes).
  */
object RobustnessHarness {

  /** The paper evaluates three orders; these are three valid left-deep
    * orders of Q5's join graph starting from different tables.
    */
  val JoinOrders: Seq[(String, Seq[String])] = Seq(
    "O1 (lineitem-first)" ->
      Seq("lineitem", "supplier", "orders", "customer", "nation", "region"),
    "O2 (customer-first)" ->
      Seq("customer", "orders", "lineitem", "supplier", "nation", "region"),
    "O3 (orders-first)" ->
      Seq("orders", "customer", "lineitem", "supplier", "nation", "region"),
  )

  final case class Row(strategy: Strategy, millisByOrder: Seq[(String, Double)]) {
    def spread: Double = {
      val ts = millisByOrder.map(_._2)
      ts.max / ts.min
    }
  }

  final case class Report(sf: Double, rows: Seq[Row]) {
    def of(s: Strategy): Row = rows.find(_.strategy == s).get

    def render: String = {
      val sb = new StringBuilder
      sb ++= s"Figure 4 (table form): Q5 under different join orders, TPC-H-lite SF=$sf\n"
      sb ++= ("| strategy       | " + JoinOrders.map(o => f"${o._1}%-19s").mkString(" | ") + " | max/min |\n")
      for (r <- rows) {
        val cells = r.millisByOrder.map { case (_, ms) => f"$ms%17.0fms" }.mkString(" | ")
        sb ++= f"| ${r.strategy.name}%-14s | $cells | ${r.spread}%7.2f |\n"
      }
      sb.result()
    }
  }

  def run(t: TpchLite, warmups: Int = 1): Report = {
    val q5 = QueryCatalog.byName("Q5")
    val rows = Strategy.all.map { s =>
      val timed = JoinOrders.map { case (label, order) =>
        val jq = q5.build(t).withJoinOrder(order)
        var last: ExecMetrics = null
        for (_ <- 0 to warmups) {
          val m = new ExecMetrics
          val df = Executor.execute(jq, s, ExecOpts(materializeReduced = true), Some(m))
          m.timeJoin(df.collect())
          m.release()
          last = m
        }
        label -> last.totalMillis
      }
      Row(s, timed)
    }
    Report(t.sf, rows)
  }
}
