package repro.jobs

import repro.harness.SpeedupHarness

/** spark-submit entrypoint for Figure 2 in table form (per-query runtimes of
  * the four strategies plus geomean speedups).
  * Usage: `spark-submit --class repro.jobs.SpeedupJob repro-jobs.jar [sf]`
  */
object SpeedupJob {
  def main(args: Array[String]): Unit = {
    val t = JobSession.dataset(args, "pt-speedup")
    println(SpeedupHarness.run(t).render)
  }
}
