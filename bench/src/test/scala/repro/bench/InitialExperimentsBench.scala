package repro.bench

import repro.SparkSpec
import repro.workload.{Experiments, Runner}

/** §6.1 initial experiments (Fig 8, quoted in prose): 100 single-predicate
  * COUNT/SUM/AVG queries per dataset across all 11 datasets; median error
  * and synopsis size per system.
  *
  * We run 40 queries per dataset at Ns = 10k (the paper's smaller operating
  * point). Paper headline numbers at 100k samples: median error 0.28%
  * (PH) vs 0.73% (DeepDB) vs 28.9% (DBEst++); mean size 0.48 MB vs 11.5 MB
  * vs 36.3 MB.
  */
class InitialExperimentsBench extends SparkSpec {

  private val Sf = 0.01
  private val Ns = 10000
  private val NQueries = 40

  test("Fig 8: median error and synopsis size across the 11 datasets") {
    val names = repro.data.Datasets.all.map(_.name)
    println(s"\n=== Initial experiments [sf=$Sf, Ns=$Ns, $NQueries queries each] ===")
    println(f"${"dataset"}%-10s | ${"PH err%"}%8s ${"DD err%"}%8s ${"DB err%"}%8s | ${"PH KB"}%7s ${"DD KB"}%7s ${"DB KB"}%7s")

    val results = names.map { name =>
      val r = Experiments.initialExperiment(spark, name, Sf, Ns, NQueries, seed = 31 + name.hashCode % 97)
      val ph = Runner.medianErrorPct(r.evals, "PairwiseHist")
      val dd = Runner.medianErrorPct(r.evals, "DeepDB")
      val db = Runner.medianErrorPct(r.evals, "DBEst++")
      println(f"$name%-10s | ${ScaledExperiments.fmtPct(ph)}%8s ${ScaledExperiments.fmtPct(dd)}%8s ${ScaledExperiments.fmtPct(db)}%8s | " +
        f"${r.built.sizePh / 1024}%7d ${r.built.sizeSpn / 1024}%7d ${r.built.sizeDbest / 1024}%7d")
      (name, r, ph, dd, db)
    }

    val allEvals = results.flatMap(_._2.evals)
    val overallPh = Runner.medianErrorPct(allEvals, "PairwiseHist")
    val overallDd = Runner.medianErrorPct(allEvals, "DeepDB")
    val overallDb = Runner.medianErrorPct(allEvals, "DBEst++")
    val meanSizePh = results.map(_._2.built.sizePh).sum / results.length / 1024.0
    val meanSizeDd = results.map(_._2.built.sizeSpn).sum / results.length / 1024.0
    val meanSizeDb = results.map(_._2.built.sizeDbest).sum / results.length / 1024.0
    println(f"overall medians: PH=$overallPh%.2f%% DeepDB=$overallDd%.2f%% DBEst++=$overallDb%.2f%% " +
      f"(paper 100k: 0.28 / 0.73 / 28.9)")
    println(f"mean sizes: PH=$meanSizePh%.0f KB DeepDB=$meanSizeDd%.0f KB DBEst++=$meanSizeDb%.0f KB " +
      f"(paper 100k: 480 / 11500 / 36300 KB)")

    // Shape assertions: PH is the most accurate and the smallest overall.
    assert(overallPh < overallDd, s"PH $overallPh%% should beat DeepDB $overallDd%%")
    assert(overallPh < overallDb, s"PH $overallPh%% should beat DBEst++ $overallDb%%")
    assert(overallPh < 5.0, s"PH overall median error $overallPh%%")
    // PH smallest mean synopsis, sub-MB everywhere (paper: smallest on all
    // datasets against the Python baselines; our lite baselines are leaner,
    // so we assert the mean ordering plus a clear per-dataset majority).
    assert(meanSizePh < meanSizeDd && meanSizePh < meanSizeDb,
      s"PH mean size $meanSizePh should be smallest ($meanSizeDd / $meanSizeDb)")
    assert(results.forall(_._2.built.sizePh < 1024 * 1024), "PH sub-MB on every dataset")
    val phSmallest = results.count(r => r._2.built.sizePh <= r._2.built.sizeSpn && r._2.built.sizePh <= r._2.built.sizeDbest)
    assert(phSmallest >= 6, s"PH smallest on only $phSmallest/11 datasets")
    // PH more accurate than DeepDB on most datasets (paper: 10 of 11).
    val phWins = results.count(r => r._3 <= r._4 || r._4.isNaN)
    assert(phWins >= 6, s"PH beats DeepDB on only $phWins/11 datasets")
  }
}
