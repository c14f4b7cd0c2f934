package repro

import repro.core._
import repro.data.{Cleaning, MobySynth}

/** Shared, lazily-computed pipeline artifacts at the standard unit-test
  * scale (sf=0.05, seed=7). Suites run sequentially in one forked JVM
  * (build.sbt: `Test / parallelExecution := false`), so each stage is
  * computed once per test run regardless of how many suites touch it.
  */
object TestFixtures {
  val sf = 0.05
  val seed = 7L

  private def spark = SparkSpec.shared

  lazy val counts = MobySynth.counts(sf)
  lazy val data = MobySynth.generate(spark, sf, seed)
  lazy val cleaned = Cleaning.clean(data)
  lazy val report = Cleaning.report(data, cleaned)
  lazy val candidate = CandidateGraph.build(spark, cleaned)
  lazy val selection = StationSelection.select(spark, candidate)
  lazy val selected = SelectedGraph.build(spark, candidate, selection)

  lazy val basic = Pipeline.communities(spark, selected, TemporalGraphs.TNull)
  lazy val day = Pipeline.communities(spark, selected, TemporalGraphs.TDay)
  lazy val hourly = Pipeline.communities(spark, selected, TemporalGraphs.THour)
}
