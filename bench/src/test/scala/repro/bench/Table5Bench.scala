package repro.bench

import repro.SparkSpec
import repro.core.AggFn
import repro.workload.Runner

/** Table 5: median relative error (%) by aggregation function on the
  * scaled-up Power and Flights datasets, for PairwiseHist / DeepDB-lite /
  * DBEst++-lite. Also prints the Fig 10(d) original-vs-IDEBench contrast.
  *
  * Paper reference values (1B rows; PH & DeepDB at 1M samples, DBEst++ at
  * 100k) are embedded in the printed table for side-by-side reading and in
  * EXPERIMENTS.md for the diff.
  */
class Table5Bench extends SparkSpec {

  private val paperPower = Map[AggFn, (Double, Double, Double)](
    AggFn.Count -> (0.19, 0.05, 24.82),
    AggFn.Sum -> (0.32, 14.18, 56.46),
    AggFn.Avg -> (0.42, 0.50, 17.86),
    AggFn.Var -> (0.84, Double.NaN, 98.50),
    AggFn.Min -> (0.00, Double.NaN, Double.NaN),
    AggFn.Max -> (1.25, Double.NaN, Double.NaN),
    AggFn.Median -> (0.00, Double.NaN, Double.NaN)
  )
  private val paperFlights = Map[AggFn, (Double, Double, Double)](
    AggFn.Count -> (0.38, 0.41, 21.65),
    AggFn.Sum -> (1.15, 1.72, 3.55),
    AggFn.Avg -> (0.39, 0.28, 16.95),
    AggFn.Var -> (1.67, Double.NaN, 100.00),
    AggFn.Min -> (0.00, Double.NaN, Double.NaN),
    AggFn.Max -> (4.41, Double.NaN, Double.NaN),
    AggFn.Median -> (0.29, Double.NaN, Double.NaN)
  )

  test("Table 5: median relative error by aggregation, scaled Power & Flights") {
    val runs = Seq(
      ("Power", ScaledExperiments.powerScaled, paperPower, 0.20, 0.45, 56.46),
      ("Flights", ScaledExperiments.flightsScaled, paperFlights, 0.43, 0.64, 28.42)
    )
    for ((label, r, paper, paperOverallPh, paperOverallDeep, paperOverallDbe) <- runs) {
      println(s"\n=== Table 5 [$label scaled, N=${r.rows}, Ns=${ScaledExperiments.NsSample}] ===")
      println(f"${"Aggregation"}%-12s | ${"PH"}%6s ${"DeepDB"}%7s ${"DBEst++"}%8s | paper: PH / DeepDB / DBEst++")
      for (fn <- AggFn.all) {
        val ph = Runner.medianErrorPct(r.evals, "PairwiseHist", Some(fn))
        val dd = Runner.medianErrorPct(r.evals, "DeepDB", Some(fn))
        val db = Runner.medianErrorPct(r.evals, "DBEst++", Some(fn))
        val (pPh, pDd, pDb) = paper(fn)
        println(
          f"${fn.sqlName}%-12s | ${ScaledExperiments.fmtPct(ph)} ${ScaledExperiments.fmtPct(dd)}%7s " +
            f"${ScaledExperiments.fmtPct(db)}%8s | ${ScaledExperiments.fmtPct(pPh)} / ${ScaledExperiments.fmtPct(pDd)} / ${ScaledExperiments.fmtPct(pDb)}"
        )
      }
      val overallPh = Runner.medianErrorPct(r.evals, "PairwiseHist")
      val overallDd = Runner.medianErrorPct(r.evals, "DeepDB")
      val overallDb = Runner.medianErrorPct(r.evals, "DBEst++")
      println(f"${"Overall"}%-12s | ${ScaledExperiments.fmtPct(overallPh)} ${ScaledExperiments.fmtPct(overallDd)}%7s " +
        f"${ScaledExperiments.fmtPct(overallDb)}%8s | ${ScaledExperiments.fmtPct(paperOverallPh)} / ${ScaledExperiments.fmtPct(paperOverallDeep)} / ${ScaledExperiments.fmtPct(paperOverallDbe)}")
      println(s"support: PH=${Runner.supportRate(r.evals, "PairwiseHist")} " +
        s"DeepDB=${Runner.supportRate(r.evals, "DeepDB")} DBEst++=${Runner.supportRate(r.evals, "DBEst++")}")

      // Shape assertions (not absolute-number matches):
      assert(Runner.supportRate(r.evals, "PairwiseHist") == 1.0, "PH must answer every query")
      assert(Runner.supportRate(r.evals, "DBEst++") < Runner.supportRate(r.evals, "PairwiseHist"),
        "DBEst++ supports a strict subset of queries (paper §6)")
      assert(overallPh < 15.0, s"PH overall median error $overallPh% out of range")
      // PH supports all 7 aggregations; the others do not.
      for (fn <- Seq(AggFn.Min, AggFn.Max, AggFn.Median)) {
        assert(Runner.medianErrorPct(r.evals, "DeepDB", Some(fn)).isNaN)
      }
    }
  }

  test("Fig 10(d): DeepDB degrades on real-like data; PairwiseHist stays consistent") {
    val rows = Seq(
      ("power", ScaledExperiments.powerOriginal, ScaledExperiments.powerScaled),
      ("flights", ScaledExperiments.flightsOriginal, ScaledExperiments.flightsScaled)
    )
    println("\n=== Fig 10(d): median error %, original (real-like) vs IDEBench-lite ===")
    println(f"${"dataset"}%-10s | ${"PH real"}%8s ${"PH ide"}%8s | ${"DeepDB real"}%12s ${"DeepDB ide"}%11s")
    for ((name, orig, scaled) <- rows) {
      // Compare on the COUNT/SUM/AVG subset both systems answer.
      val subsetAggs = Set[AggFn](AggFn.Count, AggFn.Sum, AggFn.Avg)
      def medFor(r: repro.workload.Experiments.RunResult, sys: String) = Runner.median(
        r.evals.filter(e => subsetAggs(e.q.agg))
          .flatMap(e => e.results(sys).map(x => Runner.relError(x.estimate, e.truth)))
      ) * 100
      val phReal = medFor(orig, "PairwiseHist")
      val phIde = medFor(scaled, "PairwiseHist")
      val ddReal = medFor(orig, "DeepDB")
      val ddIde = medFor(scaled, "DeepDB")
      println(f"$name%-10s | ${ScaledExperiments.fmtPct(phReal)}%8s ${ScaledExperiments.fmtPct(phIde)}%8s | " +
        f"${ScaledExperiments.fmtPct(ddReal)}%12s ${ScaledExperiments.fmtPct(ddIde)}%11s")
      assert(phReal < 20.0, s"PH real-data error $phReal%")
    }
  }
}
