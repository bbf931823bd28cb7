package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.dbest.DbEst
import repro.core._
import repro.gd.{CategoricalCol, ColumnSpec, NumericCol}

import scala.util.Random

class DbEstSpec extends AnyFunSuite {

  private val rng = new Random(401)
  private val N = 10000

  private val x = Array.fill(N)(math.rint(rng.nextGaussian() * 150 + 600)) // predicate column
  private val y = Array.tabulate(N)(r => math.rint(x(r) * 2 + rng.nextGaussian() * 40)) // agg column
  private val g = Array.fill(N)(math.floor(rng.nextDouble() * 3))

  private val specs = Array(
    ColumnSpec("x", NumericCol(1, 0), 0),
    ColumnSpec("y", NumericCol(1, 0), 0),
    ColumnSpec("g", CategoricalCol(Array("g0", "g1", "g2")), 0)
  )
  private val client = DbEst.fit(Array(x, y, g), specs, N.toLong)

  test("templates cover numeric (agg, pred) pairs only") {
    assert(client.templates.keySet == Set((0, 1), (1, 0)))
    assert(client.sizeBytes > 0)
  }

  test("GMM fits a Gaussian closely") {
    val xs = x.sorted
    val gmm = DbEst.fitGmm(xs)
    // CDF at the empirical median should be near 0.5.
    val med = xs(N / 2)
    assert(math.abs(gmm.cdf(med) - 0.5) < 0.05)
    // CDF far outside the data is 0/1.
    assert(gmm.cdf(xs.head - 2000) < 0.01)
    assert(gmm.cdf(xs.last + 2000) > 0.99)
  }

  test("COUNT on a Gaussian predicate column is accurate") {
    val q = Query(AggFn.Count, "y", Some(Cond("x", Op.Le, 600.0)))
    val truth = x.count(_ <= 600.0).toDouble
    val est = DbEst.run(client, q).get.estimate
    assert(math.abs(est - truth) / truth < 0.08, s"est=$est truth=$truth")
  }

  test("AVG follows the regression on functionally dependent data") {
    val q = Query(AggFn.Avg, "y", Some(Cond("x", Op.Le, 500.0)))
    val sel = (0 until N).filter(r => x(r) <= 500.0).map(y(_))
    val truth = sel.sum / sel.length
    val est = DbEst.run(client, q).get.estimate
    assert(math.abs(est - truth) / math.abs(truth) < 0.10, s"est=$est truth=$truth")
  }

  test("SUM is consistent with COUNT * AVG") {
    val w = Cond("x", Op.Ge, 700.0)
    val s = DbEst.run(client, Query(AggFn.Sum, "y", Some(w))).get.estimate
    val c = DbEst.run(client, Query(AggFn.Count, "y", Some(w))).get.estimate
    val a = DbEst.run(client, Query(AggFn.Avg, "y", Some(w))).get.estimate
    assert(math.abs(s - c * a) / s < 1e-6)
  }

  test("queries with two predicate columns are unsupported") {
    val q = Query(AggFn.Count, "y", Some(And(List(Cond("x", Op.Le, 600.0), Cond("g", Op.Eq, "g0")))))
    assert(DbEst.run(client, q).isEmpty)
    assert(!DbEst.supports(client, q))
  }

  test("OR, MIN/MAX/MEDIAN, no-predicate and categorical-predicate queries are unsupported") {
    assert(DbEst.run(client, Query(AggFn.Count, "y", Some(Or(List(Cond("x", Op.Le, 1.0), Cond("x", Op.Ge, 2.0)))))).isEmpty)
    assert(DbEst.run(client, Query(AggFn.Min, "y", Some(Cond("x", Op.Le, 600.0)))).isEmpty)
    assert(DbEst.run(client, Query(AggFn.Median, "y", Some(Cond("x", Op.Le, 600.0)))).isEmpty)
    assert(DbEst.run(client, Query(AggFn.Count, "y", None)).isEmpty)
    assert(DbEst.run(client, Query(AggFn.Count, "y", Some(Cond("g", Op.Eq, "g0")))).isEmpty)
  }

  test("same-column consolidated range works (one predicate column)") {
    val q = Query(AggFn.Count, "y", Some(And(List(Cond("x", Op.Ge, 500.0), Cond("x", Op.Le, 700.0)))))
    val truth = x.count(v => v >= 500.0 && v <= 700.0).toDouble
    val est = DbEst.run(client, q).get.estimate
    assert(math.abs(est - truth) / truth < 0.10, s"est=$est truth=$truth")
  }

  test("spiky zero-inflated data breaks the GMM density (the paper's failure mode)") {
    val spiky = Array.tabulate(N)(r => if (r % 10 == 0) math.rint(rng.nextDouble() * 1000 + 500) else 0.0)
    val flat = Array.fill(N)(math.rint(rng.nextDouble() * 100))
    val specs2 = Array(ColumnSpec("s", NumericCol(1, 0), 0), ColumnSpec("f", NumericCol(1, 0), 0))
    val c2 = DbEst.fit(Array(spiky, flat), specs2, N.toLong)
    val q = Query(AggFn.Count, "f", Some(Cond("s", Op.Ge, 1.0)))
    val truth = spiky.count(_ >= 1.0).toDouble
    val est = DbEst.run(c2, q).map(_.estimate).getOrElse(0.0)
    val relErr = math.abs(est - truth) / truth
    // Expect a visibly worse error than on Gaussian data; don't demand a
    // specific magnitude, only record that it is non-trivial.
    assert(relErr > 0.02, s"unexpectedly good: est=$est truth=$truth")
  }
}
