package repro.bench

import repro.SparkSpec

/** Bench-scale (1.0) fixtures shared by all table bench suites — the lakes
  * are generated and profiled once per bench JVM.
  */
object BenchFixtures {
  val Scale = 1.0
  lazy val ctx: TableBenches.Ctx = TableBenches.context(SparkSpec.shared, Scale)
}
