package repro.workload

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core._
import repro.data.Datasets

class WorkloadSpec extends SparkSpec {

  private lazy val df = Datasets.byName("power")(spark, 0.002).cache()
  private lazy val gt = GroundTruth.forDataFrame(df, "power")
  private lazy val prof = QueryGen.profile(df)

  // The Oracle loads every column as VARCHAR on the DuckDB side, so shared
  // SQL casts explicitly — both engines accept the same text.
  test("exact aggregation matches the DuckDB oracle (COUNT)") {
    df.createOrReplaceTempView("power_v")
    val sql = "SELECT count(global_active_power) AS result FROM power_v " +
      "WHERE CAST(voltage AS DOUBLE) <= 240.0"
    val sparkDf = spark.sql(sql)
    Oracle.assertEquivalent(sparkDf, sql.replace("power_v", "power_o"), "power_o" -> df)
  }

  test("exact aggregation matches the DuckDB oracle (AVG with AND predicate)") {
    df.createOrReplaceTempView("power_v")
    val sql = "SELECT round(avg(CAST(global_intensity AS DOUBLE)), 4) AS result FROM power_v " +
      "WHERE CAST(global_active_power AS DOUBLE) >= 1.0 AND CAST(hour AS INT) <= 12"
    Oracle.assertEquivalent(spark.sql(sql), sql.replace("power_v", "power_o"), "power_o" -> df)
  }

  test("GroundTruth answers equal direct Spark computation") {
    val q = Query(AggFn.Avg, "voltage", Some(Cond("hour", Op.Le, 11.0)))
    val duck = gt.answer(q).get
    val sparkV = df.filter(col("hour") <= 11).agg(avg("voltage")).collect()(0).getDouble(0)
    assert(math.abs(duck - sparkV) < 1e-6)
  }

  test("GroundTruth handles MEDIAN and VAR_POP") {
    val qm = Query(AggFn.Median, "voltage", Some(Cond("hour", Op.Ge, 12.0)))
    val qv = Query(AggFn.Var, "voltage", Some(Cond("hour", Op.Ge, 12.0)))
    assert(gt.answer(qm).nonEmpty)
    assert(gt.answer(qv).nonEmpty)
    val sparkVar = df.filter(col("hour") >= 12).agg(var_pop("voltage")).collect()(0).getDouble(0)
    assert(math.abs(gt.answer(qv).get - sparkVar) / sparkVar < 1e-6)
  }

  test("GroundTruth groups match Spark") {
    val q = Query(AggFn.Count, "voltage", Some(Cond("hour", Op.Le, 5.0)), groupBy = Some("weekday"))
    val duck = gt.answerGroups(q)
    val sparkRows = df.filter(col("hour") <= 5).groupBy("weekday")
      .agg(count("voltage").as("c")).collect()
      .map(r => r.getString(0) -> r.getLong(1).toDouble).toMap
    assert(duck == sparkRows)
  }

  test("count() applies the predicate") {
    val all = gt.count(None)
    val some = gt.count(Some("hour <= 11"))
    assert(all == df.count())
    assert(some > 0 && some < all)
  }

  test("profile captures numeric quantiles and categorical values") {
    val volt = prof.cols.find(_.name == "voltage").get
    assert(!volt.isCategorical)
    assert(volt.quantiles.length == 101)
    assert(volt.quantiles.head <= volt.quantiles.last)
    val wd = prof.cols.find(_.name == "weekday").get
    assert(wd.isCategorical)
    assert(wd.values.nonEmpty && wd.values.forall(_.startsWith("day")))
  }

  test("generated queries respect the selectivity floor") {
    val n = df.count()
    val qs = QueryGen.generate(prof, gt, n, count = 15, Seq(AggFn.Count, AggFn.Sum, AggFn.Avg),
      maxPreds = 2, minSelectivity = 1e-3, seed = 77)
    assert(qs.length == 15)
    val floor = (1e-3 * n).toLong
    for (q <- qs) {
      assert(gt.count(q.where.map(_.toSql)) >= floor, s"$q")
      assert(gt.answer(q).nonEmpty)
    }
  }

  test("generation is deterministic in the seed") {
    val a = QueryGen.generate(prof, gt, df.count(), 8, Seq(AggFn.Count), 2, 1e-3, seed = 5)
    val b = QueryGen.generate(prof, gt, df.count(), 8, Seq(AggFn.Count), 2, 1e-3, seed = 5)
    assert(a.map(_.toSql("t")) == b.map(_.toSql("t")))
  }

  test("multi-predicate generation produces AND and OR trees") {
    val qs = QueryGen.generate(prof, gt, df.count(), 30, Seq(AggFn.Count), maxPreds = 5,
      minSelectivity = 1e-4, seed = 13, orShare = 0.4)
    assert(qs.exists(_.where.exists(_.hasOr)))
    assert(qs.exists(q => q.where.exists(w => !w.hasOr && w.columns.size > 1)))
  }

  test("Query.toSql renders literals and connectives") {
    val q = Query(AggFn.Sum, "x", Some(And(List(Cond("a", Op.Ge, 1.5), Cond("s", Op.Eq, "it's")))))
    assert(q.toSql("t") == "SELECT sum(x) AS result FROM t WHERE (a >= 1.5) AND (s = 'it''s')")
  }

  test("end-to-end runner on a small query set") {
    val built = Runner.buildAll(df, nS = 5000, seed = 3)
    val qs = QueryGen.generate(prof, gt, df.count(), 12, Seq(AggFn.Count, AggFn.Avg), 2, 1e-3, seed = 21)
    val evals = Runner.evaluate(built, qs, gt)
    assert(evals.nonEmpty)
    val phErr = Runner.medianErrorPct(evals, "PairwiseHist")
    assert(!phErr.isNaN)
    assert(phErr < 25.0, s"median PH error $phErr%")
    assert(Runner.supportRate(evals, "PairwiseHist") == 1.0)
    assert(Runner.supportRate(evals, "DBEst++") <= Runner.supportRate(evals, "PairwiseHist"))
    val (correct, width) = Runner.boundsStats(evals, "PairwiseHist")
    assert(correct >= 0.0 && correct <= 100.0)
    assert(width >= 0.0 || width.isNaN)
  }

  test("relError conventions") {
    assert(Runner.relError(5.0, 5.0) == 0.0)
    assert(Runner.relError(0.0, 0.0) == 0.0)
    assert(Runner.relError(3.0, 0.0) == 1.0)
    assert(Runner.relError(110.0, 100.0) == 0.10)
  }

  test("median helper") {
    assert(Runner.median(Seq(3.0, 1.0, 2.0)) == 2.0)
    assert(Runner.median(Seq(1.0, 2.0, 3.0, 4.0)) == 2.5)
    assert(Runner.median(Nil).isNaN)
  }
}
