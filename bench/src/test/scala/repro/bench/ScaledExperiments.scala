package repro.bench

import repro.SparkSpec
import repro.workload.Experiments
import repro.workload.Experiments.RunResult

/** Shared lazy cache for the scaled-up experiments (§6.3–§6.6).
  *
  * The paper scales Power and Flights to one billion rows with IDEBench; we
  * scale with IDEBench-lite to bench-size row counts (relative errors — the
  * quantity every table reports — do not depend on absolute scale, only on
  * the data distribution and the synopsis). Each dataset is evaluated both
  * in its original (real-like, spiky) form and its IDEBench (gaussianised)
  * form, which also reproduces the Fig 10(d) contrast.
  *
  * Computed once per JVM; Table5Bench, Table6Bench and SummaryBench all
  * read from here (bench/test runs suites sequentially in one JVM).
  */
object ScaledExperiments {

  val NsSample = 20000
  val NQueries = 120
  val Seed = 1234L

  type RunResultT = RunResult

  lazy val powerOriginal: RunResult =
    Experiments.originalExperiment(SparkSpec.shared, "power", sf = 0.05, NsSample, NQueries, Seed)

  lazy val flightsOriginal: RunResult =
    Experiments.originalExperiment(SparkSpec.shared, "flights", sf = 0.02, NsSample, NQueries, Seed + 1)

  lazy val powerScaled: RunResult =
    Experiments.scaledExperiment(SparkSpec.shared, "power", srcSf = 0.05, targetRows = 2000000L, NsSample, NQueries, Seed + 2)

  lazy val flightsScaled: RunResult =
    Experiments.scaledExperiment(SparkSpec.shared, "flights", srcSf = 0.02, targetRows = 1000000L, NsSample, NQueries, Seed + 3)

  def fmtPct(v: Double): String = if (v.isNaN) "   -" else f"$v%6.2f"
}
