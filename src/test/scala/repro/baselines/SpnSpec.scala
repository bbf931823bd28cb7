package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.spn.Spn
import repro.core._
import repro.gd.{ColumnSpec, NumericCol}

import scala.util.Random

class SpnSpec extends AnyFunSuite {

  private val rng = new Random(301)
  private val N = 12000

  // Two independent groups: (a, b) correlated; c independent.
  private val a = Array.fill(N)(math.rint(rng.nextGaussian() * 100 + 500))
  private val b = Array.tabulate(N)(r => math.rint(a(r) * 0.8 + rng.nextGaussian() * 30))
  private val c = Array.fill(N)(math.rint(rng.nextDouble() * 1000))

  private val specs = Array(
    ColumnSpec("a", NumericCol(1, 0), 0),
    ColumnSpec("b", NumericCol(1, 0), 0),
    ColumnSpec("c", NumericCol(1, 0), 0)
  )
  private val model = Spn.learn(Array(a, b, c), specs, N.toLong)

  private def exactCount(f: Int => Boolean): Double = (0 until N).count(f).toDouble

  test("structure: learning produces a non-leaf network") {
    assert(model.root.isInstanceOf[Spn.ProductNode] || model.root.isInstanceOf[Spn.SumNode])
    assert(model.sizeBytes > 0)
  }

  test("COUNT on Gaussian data is accurate (DeepDB's home turf)") {
    val q = Query(AggFn.Count, "a", Some(Cond("a", Op.Le, 500.0)))
    val truth = exactCount(r => a(r) <= 500.0)
    val est = Spn.run(model, q).get.estimate
    assert(math.abs(est - truth) / truth < 0.06, s"est=$est truth=$truth")
  }

  test("COUNT with independent-column predicate") {
    val q = Query(AggFn.Count, "a", Some(Cond("c", Op.Ge, 750.0)))
    val truth = exactCount(r => c(r) >= 750.0)
    val est = Spn.run(model, q).get.estimate
    assert(math.abs(est - truth) / truth < 0.08, s"est=$est truth=$truth")
  }

  test("AVG under a correlated predicate tracks the conditional mean") {
    val q = Query(AggFn.Avg, "a", Some(Cond("b", Op.Le, 300.0)))
    val sel = (0 until N).filter(r => b(r) <= 300.0).map(a(_))
    val truth = sel.sum / sel.length
    val est = Spn.run(model, q).get.estimate
    // The sum-node row clustering should capture most of the correlation.
    assert(math.abs(est - truth) / truth < 0.25, s"est=$est truth=$truth (global=${a.sum / N})")
  }

  test("SUM is consistent with COUNT * AVG") {
    val q = Cond("c", Op.Le, 400.0)
    val sumR = Spn.run(model, Query(AggFn.Sum, "a", Some(q))).get.estimate
    val cntR = Spn.run(model, Query(AggFn.Count, "a", Some(q))).get.estimate
    val avgR = Spn.run(model, Query(AggFn.Avg, "a", Some(q))).get.estimate
    assert(math.abs(sumR - cntR * avgR) / sumR < 1e-6)
  }

  test("OR queries are unsupported (matches the paper's observation)") {
    val q = Query(AggFn.Count, "a", Some(Or(List(Cond("b", Op.Le, 100.0), Cond("c", Op.Ge, 900.0)))))
    assert(Spn.run(model, q).isEmpty)
  }

  test("VAR/MIN/MAX/MEDIAN are unsupported") {
    for (fn <- Seq(AggFn.Var, AggFn.Min, AggFn.Max, AggFn.Median)) {
      assert(Spn.run(model, Query(fn, "a", Some(Cond("c", Op.Le, 500.0)))).isEmpty, s"$fn")
    }
  }

  test("bounds bracket the estimate") {
    val q = Query(AggFn.Count, "a", Some(Cond("b", Op.Le, 400.0)))
    val r = Spn.run(model, q).get
    assert(r.lo <= r.estimate && r.estimate <= r.hi)
  }

  test("nulls in the aggregation column reduce COUNT") {
    val withNulls = a.zipWithIndex.map { case (v, i) => if (i % 4 == 0) Double.NaN else v }
    val m2 = Spn.learn(Array(withNulls, b, c), specs, N.toLong)
    val q = Query(AggFn.Count, "a", None)
    val est = Spn.run(m2, q).get.estimate
    val truth = withNulls.count(!_.isNaN).toDouble
    assert(math.abs(est - truth) / truth < 0.05, s"est=$est truth=$truth")
  }
}
