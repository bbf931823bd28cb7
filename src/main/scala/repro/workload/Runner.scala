package repro.workload

import org.apache.spark.sql.DataFrame
import repro.baselines.dbest.DbEst
import repro.baselines.spn.Spn
import repro.core._
import repro.encoding.Codec
import repro.gd.{GreedyGD, Preprocess}

/** End-to-end harness: build PairwiseHist + both baselines on a dataset,
  * evaluate query sets against DuckDB ground truth, and collect the error /
  * latency / size / build-time metrics the paper's tables report.
  */
object Runner {

  /** All three systems built on the same GD-domain sample. */
  final case class Built(
      ph: PairwiseHist,
      engine: Engine,
      spn: Spn.Model,
      dbest: DbEst.Client,
      buildMsPh: Double,
      buildMsSpn: Double,
      buildMsDbest: Double,
      sizePh: Long,
      sizeSpn: Long,
      sizeDbest: Long
  )

  /** Build all systems with the paper's defaults: M = 1% of Ns, alpha =
    * 0.001. `gdSeeds = true` seeds PairwiseHist initial edges with GreedyGD
    * bases (the paper's integrated framework).
    */
  def buildAll(
      df: DataFrame,
      nS: Int,
      seed: Long = 42,
      gdSeeds: Boolean = false,
      dbestWorkload: Option[Seq[Query]] = None
  ): Built = {
    val n = df.count()
    val pre = Preprocess.run(df)
    val dbestTemplates = dbestWorkload.map(dbestTemplatesFor(_, pre.specs))
    val m = math.max(2L, (nS * 0.01).toLong)
    val alpha = 0.001

    val sample = Builder.collectSample(pre.df, n, nS, seed)

    val seeds: Map[Int, Array[Double]] =
      if (!gdSeeds) Map.empty
      else {
        // Bit selection is a statistics problem: 5k rows suffice and keep the
        // greedy search cheap on wide schemas.
        val compressed = GreedyGD.run(pre.df, sampleRows = math.min(nS, 5000), seed = seed)
        pre.specs.indices.map(i => i -> GreedyGD.baseValues(compressed, pre.specs(i).name)).toMap
      }

    val t0 = System.nanoTime()
    val ph = Builder.build(sample, pre.specs, n, m, alpha, seeds)
    val t1 = System.nanoTime()
    val spn = Spn.learn(sample, pre.specs, n)
    val t2 = System.nanoTime()
    val dbest = DbEst.fit(sample, pre.specs, n, dbestTemplates)
    val t3 = System.nanoTime()

    // When a workload restriction was applied, report the extrapolated
    // full-template size (the paper counts all models needed to match
    // PairwiseHist's query support).
    val dbestSize = if (dbestTemplates.isEmpty) dbest.sizeBytes else dbest.fullSupportSizeBytes

    Built(
      ph, new Engine(ph), spn, dbest,
      (t1 - t0) / 1e6, (t2 - t1) / 1e6, (t3 - t2) / 1e6,
      Codec.sizeBytes(ph), spn.sizeBytes, dbestSize
    )
  }

  /** Template keys a query workload needs from DBEst++ (agg, pred) pairs. */
  def dbestTemplatesFor(queries: Seq[Query], specs: Array[repro.gd.ColumnSpec]): Seq[(Int, Int)] =
    queries.flatMap { q =>
      val predCols = q.where.map(_.columns.toSeq).getOrElse(Nil)
      val a = specs.indexWhere(_.name == q.aggCol)
      if (predCols.length == 1 && a >= 0) {
        val p = specs.indexWhere(_.name == predCols.head)
        if (p >= 0 && p != a) Some((a, p)) else None
      } else None
    }.distinct

  /** One query's evaluation: exact answer + per-system (result, latency ms). */
  final case class Eval(
      q: Query,
      truth: Double,
      results: Map[String, Option[AqpResult]],
      latencyMs: Map[String, Double]
  )

  val Systems = Seq("PairwiseHist", "DeepDB", "DBEst++")

  def evaluate(built: Built, queries: Seq[Query], gt: GroundTruth): Seq[Eval] =
    queries.flatMap { q =>
      gt.answer(q).map { truth =>
        def timed(f: => Option[AqpResult]): (Option[AqpResult], Double) = {
          val t0 = System.nanoTime()
          val r = try f catch { case _: Exception => None }
          ((r, (System.nanoTime() - t0) / 1e6))
        }
        val (rPh, lPh) = timed(built.engine.run(q))
        val (rSpn, lSpn) = timed(Spn.run(built.spn, q))
        val (rDb, lDb) = timed(DbEst.run(built.dbest, q))
        Eval(
          q, truth,
          Map("PairwiseHist" -> rPh, "DeepDB" -> rSpn, "DBEst++" -> rDb),
          Map("PairwiseHist" -> lPh, "DeepDB" -> lSpn, "DBEst++" -> lDb)
        )
      }
    }

  /** Relative error with the conventions the paper's tables need: exact
    * hits are 0 even at truth 0; a wrong answer against a zero truth counts
    * as 100%.
    */
  def relError(est: Double, truth: Double): Double = {
    if (est == truth) 0.0
    else if (math.abs(truth) < 1e-12) 1.0
    else math.abs(est - truth) / math.abs(truth)
  }

  def median(xs: Seq[Double]): Double = {
    if (xs.isEmpty) Double.NaN
    else {
      val s = xs.sorted
      val n = s.length
      if (n % 2 == 1) s(n / 2) else (s(n / 2 - 1) + s(n / 2)) / 2
    }
  }

  /** Median relative error (%) for one system over evaluations where it
    * produced an answer, optionally filtered by aggregation function.
    */
  def medianErrorPct(evals: Seq[Eval], system: String, agg: Option[AggFn] = None): Double = {
    val errs = evals
      .filter(e => agg.forall(_ == e.q.agg))
      .flatMap(e => e.results(system).map(r => relError(r.estimate, e.truth)))
    median(errs) * 100
  }

  /** Share of queries the system answered at all (its supported set). */
  def supportRate(evals: Seq[Eval], system: String): Double =
    if (evals.isEmpty) Double.NaN
    else evals.count(_.results(system).nonEmpty).toDouble / evals.length

  /** Bounds correct-rate (%) and median width (% of truth) — Table 6. */
  def boundsStats(evals: Seq[Eval], system: String): (Double, Double) = {
    val answered = evals.flatMap(e => e.results(system).map(r => (r, e.truth)))
    if (answered.isEmpty) return (Double.NaN, Double.NaN)
    val correct = answered.count { case (r, t) => r.contains(t) }.toDouble / answered.length * 100
    val widths = answered.collect {
      case (r, t) if math.abs(t) > 1e-12 => r.width / math.abs(t) * 100
    }
    (correct, median(widths))
  }

  def medianLatencyMs(evals: Seq[Eval], system: String): Double =
    median(evals.filter(_.results(system).nonEmpty).map(_.latencyMs(system)))
}
