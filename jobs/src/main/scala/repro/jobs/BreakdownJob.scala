package repro.jobs

import repro.harness.BreakdownHarness

/** spark-submit entrypoint for Figure 3 in table form (Q5 phase breakdown).
  * Usage: `spark-submit --class repro.jobs.BreakdownJob repro-jobs.jar [sf]`
  */
object BreakdownJob {
  def main(args: Array[String]): Unit = {
    val t = JobSession.dataset(args, "pt-breakdown")
    println(BreakdownHarness.run(t).render)
  }
}
