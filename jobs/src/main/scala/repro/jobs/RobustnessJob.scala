package repro.jobs

import repro.harness.RobustnessHarness

/** spark-submit entrypoint for Figure 4 in table form (Q5 join-order
  * sensitivity).
  * Usage: `spark-submit --class repro.jobs.RobustnessJob repro-jobs.jar [sf]`
  */
object RobustnessJob {
  def main(args: Array[String]): Unit = {
    val t = JobSession.dataset(args, "pt-robustness")
    println(RobustnessHarness.run(t).render)
  }
}
