package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class TheoremsSpec extends AnyFunSuite {

  private val alpha = 0.001

  test("weighted centre bounds bracket the true centre for uniform bins (Theorem 1)") {
    val rng = new Random(29)
    var contained = 0
    val trials = 200
    for (_ <- 1 to trials) {
      val h = 2000
      val xs = Array.fill(h)(math.rint(rng.nextDouble() * 1000))
      val vMin = xs.min; val vMax = xs.max
      val u = xs.distinct.length.toLong
      val centre = xs.sum / h
      val (lo, hi) = Theorems.weightedCentreBounds(h.toLong, u, vMin, vMax, m = 100, alpha)
      assert(lo <= hi)
      if (centre >= lo && centre <= hi) contained += 1
    }
    // Bounds hold conditional on the bin passing the test; with uniform
    // data nearly all bins pass, so containment should be near-total.
    assert(contained >= trials * 95 / 100, s"contained=$contained/$trials")
  }

  test("weighted centre bounds tighten as h grows") {
    val (lo1, hi1) = Theorems.weightedCentreBounds(200, 100, 0, 1000, 100, alpha)
    val (lo2, hi2) = Theorems.weightedCentreBounds(20000, 100, 0, 1000, 100, alpha)
    assert(hi2 - lo2 < hi1 - lo1)
  }

  test("non-passing bins (h < M) use the adversarial bounds") {
    // h=10, u=3, mu=1: slack = 2*3/(2*10) = 0.3
    val (lo, hi) = Theorems.weightedCentreBounds(10, 3, 0, 100, m = 100, alpha)
    assert(math.abs(lo - 0.3) < 1e-12)
    assert(math.abs(hi - 99.7) < 1e-12)
  }

  test("adversarial bounds contain any arrangement of points") {
    val rng = new Random(31)
    for (_ <- 1 to 100) {
      // u distinct integer values in [0, 50], h total points.
      val u = 2 + rng.nextInt(8)
      val values = rng.shuffle((0 to 50).toList).take(u).map(_.toDouble)
      val h = u + rng.nextInt(20)
      val pts = values ++ List.fill(h - u)(values(rng.nextInt(u)))
      val vMin = pts.min; val vMax = pts.max
      val centre = pts.sum / h
      val (lo, hi) = Theorems.weightedCentreBounds(h.toLong, pts.distinct.length.toLong, vMin, vMax, m = 1000, alpha)
      assert(centre >= lo - 1e-9 && centre <= hi + 1e-9, s"centre=$centre not in [$lo,$hi]")
    }
  }

  test("single-value bins have a point centre") {
    val (lo, hi) = Theorems.weightedCentreBounds(50, 1, 7, 7, 10, alpha)
    assert(lo == 7.0 && hi == 7.0)
  }

  test("empty bins return the full range") {
    val (lo, hi) = Theorems.weightedCentreBounds(0, 0, 3, 9, 10, alpha)
    assert(lo == 3.0 && hi == 9.0)
  }

  test("partial count bounds are exact at the extremes (Theorem 2)") {
    assert(Theorems.partialCountBounds(100, 5, 0, alpha) == ((0.0, 0.0)))
    assert(Theorems.partialCountBounds(100, 5, 5, alpha) == ((100.0, 100.0)))
  }

  test("partial count bounds bracket h*sBar/s and stay in [0, h]") {
    for (s <- 2 to 10; sBar <- 1 until s) {
      val h = 500L
      val (lo, hi) = Theorems.partialCountBounds(h, s, sBar, alpha)
      val expected = h.toDouble * sBar / s
      assert(lo <= expected && expected <= hi, s"s=$s sBar=$sBar")
      assert(lo >= 0 && hi <= h)
    }
  }

  test("partial count bounds contain actual partial counts of uniform data") {
    val rng = new Random(37)
    var ok = 0
    val trials = 300
    for (_ <- 1 to trials) {
      val h = 1000
      val s = 5
      val xs = Array.fill(h)(rng.nextInt(s))
      val sBar = 1 + rng.nextInt(s - 1)
      val actual = xs.count(_ < sBar)
      val (lo, hi) = Theorems.partialCountBounds(h.toLong, s, sBar, alpha)
      if (actual >= lo && actual <= hi) ok += 1
    }
    assert(ok >= trials * 97 / 100, s"ok=$ok/$trials")
  }

  test("coverage bounds collapse for exact coverages") {
    assert(Theorems.coverageBounds(0.0, 100, 10, 50, alpha) == ((0.0, 0.0)))
    assert(Theorems.coverageBounds(1.0, 100, 10, 50, alpha) == ((1.0, 1.0)))
  }

  test("coverage bounds for non-passing bins are 1/h and 1-1/h (Eqs 22-23)") {
    val (lo, hi) = Theorems.coverageBounds(0.4, 10, 5, m = 100, alpha)
    assert(math.abs(lo - 0.1) < 1e-12)
    assert(math.abs(hi - 0.9) < 1e-12)
  }

  test("coverage bounds bracket the estimate for passing bins") {
    for (beta <- Seq(0.1, 0.25, 0.5, 0.75, 0.9)) {
      val (lo, hi) = Theorems.coverageBounds(beta, 5000, 400, m = 100, alpha)
      assert(lo <= beta + 1e-12 && beta <= hi + 1e-12, s"beta=$beta lo=$lo hi=$hi")
      assert(lo >= 0 && hi <= 1)
    }
  }

  test("coverage bounds tighten with larger h") {
    val (lo1, hi1) = Theorems.coverageBounds(0.5, 200, 50, 100, alpha)
    val (lo2, hi2) = Theorems.coverageBounds(0.5, 20000, 50, 100, alpha)
    assert(hi2 - lo2 < hi1 - lo1)
  }
}
