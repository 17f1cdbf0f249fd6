package repro.bench

import repro.SparkSpec

/** Shared experiment instances for the bench suites: `full` scale for
  * Tables I–VI and VIII, `small` scale for the 25-config Table VII sweep
  * and the 8-head Table IX sweep (DESIGN.md §5/§6). Lazy, so the benchmark
  * and ground truth are generated once per JVM and reused by every suite.
  */
object BenchCtx {
  lazy val full: Experiment  = new Experiment(SparkSpec.shared, BenchConfig.bench)
  lazy val small: Experiment = new Experiment(SparkSpec.shared, BenchConfig.small)

  def banner(title: String): Unit = {
    println()
    println("=" * 78)
    println(title)
    println("=" * 78)
  }
}
