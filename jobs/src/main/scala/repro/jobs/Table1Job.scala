package repro.jobs

import repro.harness.Table1Harness

/** spark-submit entrypoint for the paper's Table 1 (Q5 join input sizes).
  * Usage: `spark-submit --class repro.jobs.Table1Job repro-jobs.jar [sf]`
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val t = JobSession.dataset(args, "pt-table1")
    println(Table1Harness.run(t).render)
  }
}
