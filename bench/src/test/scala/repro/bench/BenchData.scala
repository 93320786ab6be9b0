package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import repro.SparkSpec
import repro.tpch.TpchLite

/** Shared benchmark fixtures: one cached TPC-H-lite dataset at BENCH_SF
  * (default 0.1 ≈ 100 MB, the paper's workload scaled to the harness) for
  * the whole bench JVM, plus a result sink under `results/`.
  */
object BenchData {
  val sf: Double = sys.env.getOrElse("BENCH_SF", "0.1").toDouble

  lazy val tpch: TpchLite = TpchLite(SparkSpec.shared, sf).cached()

  /** Print a result table and persist it under results/ for EXPERIMENTS.md. */
  def report(name: String, body: String): Unit = {
    println(body)
    val dir = Paths.get(sys.props.getOrElse("repro.results.dir", "results"))
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), body.getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }
}
