package repro.bench

import repro.SparkSpec

/** One shared toy-scale experiment for the whole unit-test run — the same
  * pipeline the bench suites run at full scale, generated once.
  */
object UnitCtx {
  lazy val exp: Experiment = new Experiment(SparkSpec.shared, BenchConfig.unit)
}
