package repro

import repro.core.Cmdl
import repro.lake.{Lake, LakeGen}

/** Shared, lazily-built fixtures: the small-scale lakes and a profiled CMDL
  * instance are constructed once per test JVM (suites run sequentially in a
  * single forked JVM, see build.sbt).
  */
object TestFixtures {
  val Scale = 0.3

  lazy val pharma: Lake = LakeGen.pharma(Scale)
  lazy val ukOpen: Lake = LakeGen.ukOpen(Scale)
  lazy val mlOpen: Lake = LakeGen.mlOpen(Scale)

  lazy val cmdlPharma: Cmdl = new Cmdl(SparkSpec.shared, pharma)
  lazy val cmdlUkOpen: Cmdl = new Cmdl(SparkSpec.shared, ukOpen)
}
