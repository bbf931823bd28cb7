package repro.core

import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType
import repro.SparkSpec
import repro.gd.{ColumnSpec, NumericCol}

/** The distributed builder must produce the same synopsis as the local
  * builder on the same sample — the Spark path only changes WHERE the
  * sufficient statistics are computed, not WHAT they are.
  */
class DistributedBuilderSpec extends SparkSpec {

  private def specs(names: String*): Array[ColumnSpec] =
    names.map(n => ColumnSpec(n, NumericCol(1, 0), 0)).toArray

  private lazy val sampleDf = {
    spark.range(12000).select(
      (rand(31) * 1000).cast(LongType).as("a"),
      (col("id") % 300).cast(LongType).as("b"),
      when(rand(32) < 0.08, lit(null)).otherwise(pow(rand(33), 3.0).multiply(500).cast(LongType)).as("c")
    ).cache()
  }

  private lazy val localSample: Array[Array[Double]] = {
    val rows = sampleDf.collect()
    Array.tabulate(3)(c => rows.map(r => if (r.isNullAt(c)) Double.NaN else r.getLong(c).toDouble))
  }

  private lazy val phLocal = Builder.build(localSample, specs("a", "b", "c"), 120000L, 120, 0.001)
  private lazy val phDist = DistributedBuilder.build(sampleDf, specs("a", "b", "c"), 120000L, 120, 0.001)

  private def assertDimEqual(x: DimMeta, y: DimMeta, label: String): Unit = {
    assert(x.edges.toSeq == y.edges.toSeq, s"$label edges")
    assert(x.counts.toSeq == y.counts.toSeq, s"$label counts")
    assert(x.vMin.toSeq == y.vMin.toSeq, s"$label vMin")
    assert(x.vMax.toSeq == y.vMax.toSeq, s"$label vMax")
    assert(x.unique.toSeq == y.unique.toSeq, s"$label unique")
  }

  test("1-d histograms are identical to the local builder") {
    for (i <- 0 until 3) assertDimEqual(phLocal.hist1d(i).meta, phDist.hist1d(i).meta, s"col $i")
  }

  test("2-d histograms are identical to the local builder") {
    assert(phDist.hist2d.keySet == phLocal.hist2d.keySet)
    for ((k, a) <- phLocal.hist2d) {
      val b = phDist.hist2d(k)
      assertDimEqual(a.metaI, b.metaI, s"pair $k dim i")
      assertDimEqual(a.metaJ, b.metaJ, s"pair $k dim j")
      assert(a.counts.map(_.toSeq).toSeq == b.counts.map(_.toSeq).toSeq, s"pair $k matrix")
    }
  }

  test("null counts and parameters carry over") {
    assert(phDist.nullCounts.toSeq == phLocal.nullCounts.toSeq)
    assert(phDist.nS == phLocal.nS)
    assert(phDist.n == phLocal.n && phDist.m == phLocal.m && phDist.alpha == phLocal.alpha)
  }

  test("engines over both synopses answer identically") {
    val el = new Engine(phLocal)
    val ed = new Engine(phDist)
    val queries = Seq(
      Query(AggFn.Count, "a", Some(Cond("b", Op.Le, 150.0))),
      Query(AggFn.Sum, "a", Some(And(List(Cond("b", Op.Ge, 50.0), Cond("c", Op.Le, 100.0))))),
      Query(AggFn.Avg, "c", Some(Or(List(Cond("a", Op.Le, 200.0), Cond("b", Op.Ge, 250.0))))),
      Query(AggFn.Median, "a", Some(Cond("c", Op.Ge, 10.0))),
      Query(AggFn.Min, "b", Some(Cond("a", Op.Ge, 500.0)))
    )
    for (q <- queries) {
      val (l, d) = (el.run(q), ed.run(q))
      assert(l.map(_.estimate) == d.map(_.estimate), s"$q")
      assert(l.map(_.lo) == d.map(_.lo), s"$q lo")
      assert(l.map(_.hi) == d.map(_.hi), s"$q hi")
    }
  }

  test("initial-edge seeds produce identical synopses too") {
    val seeds = Map(0 -> Array(100.0, 300.0, 500.0, 700.0, 900.0))
    val a = Builder.build(localSample, specs("a", "b", "c"), 120000L, 120, 0.001, seeds)
    val b = DistributedBuilder.build(sampleDf, specs("a", "b", "c"), 120000L, 120, 0.001, seeds)
    for (i <- 0 until 3) assertDimEqual(a.hist1d(i).meta, b.hist1d(i).meta, s"seeded col $i")
  }

  test("distributed build handles an all-null column") {
    val df = spark.range(2000).select(
      (rand(41) * 100).cast(LongType).as("x"),
      lit(null).cast(LongType).as("y")
    )
    val ph = DistributedBuilder.build(df, specs("x", "y"), 2000L, 50, 0.001)
    assert(ph.hist1d(1).meta.counts.sum == 0)
    assert(ph.nullCounts(1) == 2000L)
    assert(ph.pair(0, 1).get.counts.map(_.sum).sum == 0)
  }
}
