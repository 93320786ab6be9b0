package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.tpch.TpchLite

/** Shared spark-submit plumbing for the reproduction jobs: a local session
  * (when not provided by spark-submit) and a cached TPC-H-lite dataset at the
  * SF given as the first CLI argument (default 0.1, the benchmark scale).
  */
object JobSession {
  def session(appName: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def dataset(args: Array[String], appName: String): TpchLite = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    TpchLite(session(appName), sf).cached()
  }
}
