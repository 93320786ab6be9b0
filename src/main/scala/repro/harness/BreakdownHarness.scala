package repro.harness

import repro.core._
import repro.tpch.{QueryCatalog, TpchLite}

/** Reproduces **Figure 3** (in table form): Q5 execution time split into the
  * pre-filter ("predicate transfer") phase and the join phase, per strategy.
  * The paper's claims: Pred-Trans's transfer phase beats Yannakakis's
  * semi-join phase by ~11×, and joins accelerate ~63×/45× vs
  * No-Pred-Trans/Bloom Join.
  */
object BreakdownHarness {

  final case class Row(strategy: Strategy, transferMillis: Double, joinMillis: Double) {
    def totalMillis: Double = transferMillis + joinMillis
  }

  final case class Report(sf: Double, rows: Seq[Row]) {
    def of(s: Strategy): Row = rows.find(_.strategy == s).get

    def render: String = {
      val sb = new StringBuilder
      sb ++= s"Figure 3 (table form): Q5 phase breakdown, TPC-H-lite SF=$sf\n"
      sb ++= "| strategy       | transfer ms | join ms | total ms |\n"
      for (r <- rows)
        sb ++= f"| ${r.strategy.name}%-14s | ${r.transferMillis}%11.0f | ${r.joinMillis}%7.0f | ${r.totalMillis}%8.0f |\n"
      val speedupTransfer =
        of(Strategy.Yannakakis).transferMillis / math.max(1.0, of(Strategy.PredTrans).transferMillis)
      sb ++= f"Pred-Trans transfer phase vs Yannakakis semi-join phase: ${speedupTransfer}%.1fx faster (paper: ~11x)\n"
      sb.result()
    }
  }

  def run(t: TpchLite, warmups: Int = 1): Report = {
    val q5 = QueryCatalog.byName("Q5")
    val rows = Strategy.all.map { s =>
      var last: ExecMetrics = null
      for (_ <- 0 to warmups) last = q5.runTimed(t, s)
      Row(s, last.transferMillis, last.joinMillis)
    }
    Report(t.sf, rows)
  }
}
