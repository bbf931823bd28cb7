package repro.core

/** Closed-form bounds from §4.2 and §5.2 (Theorems 1 and 2).
  *
  * All bin values live in the GD-preprocessed integer domain, where the
  * minimum spacing between distinct values (the paper's mu) is 1.
  */
object Theorems {

  /** Minimum spacing between distinct values in the GD integer domain. */
  val Mu: Double = 1.0

  /** Weighted-centre bounds for a bin (Eq 10).
    *
    * Bins that passed the uniformity test (h >= M) get the tight Theorem 1
    * bounds; non-passing bins get the adversarial h-u+1-points-at-extremum
    * bounds. Results are clamped to [vMin, vMax].
    *
    * @return (cLow, cHigh)
    */
  def weightedCentreBounds(
      h: Long, u: Long, vMin: Double, vMax: Double, m: Long, alpha: Double
  ): (Double, Double) = {
    if (h <= 0) (vMin, vMax)
    else if (u <= 1 || vMax <= vMin) {
      val c = (vMin + vMax) / 2 // single unique value: centre is exact
      (c, c)
    } else if (h < m) {
      // Adversarial (Eq 10, h < M case): h-u+1 points at one extremum, the
      // remaining u-1 points packed at minimum spacing mu next to it.
      val slack = (u - 1).toDouble * u * Mu / (2.0 * h)
      val lo = math.max(vMin, vMin + slack)
      val hi = math.min(vMax, vMax - slack)
      if (lo <= hi) (lo, hi) else ((vMin + vMax) / 2, (vMin + vMax) / 2)
    } else {
      val s = HypothesisTest.subBins(u)
      if (s < 2) ((vMin + vMax) / 2, (vMin + vMax) / 2)
      else {
        val delta = (vMax - vMin) / s
        val chi2a = HypothesisTest.criticalValue(alpha, s - 1)
        val spread = delta / 6.0 * math.sqrt(3.0 * chi2a * (s.toDouble * s - 1) / h)
        val cLo = vMin + (s - 1) * delta / 2.0 - spread
        val cHi = vMin + (s + 1) * delta / 2.0 + spread
        (math.max(vMin, cLo), math.min(vMax, cHi))
      }
    }
  }

  /** Theorem 2: min/max total count over `sBar` of the `s` sub-bins of a bin
    * with count `h` that passed the uniformity test (Eq 17).
    *
    * @return (hLow, hHigh) clamped to [0, h]
    */
  def partialCountBounds(h: Long, s: Int, sBar: Int, alpha: Double): (Double, Double) = {
    require(sBar >= 0 && sBar <= s, s"sBar=$sBar out of [0, $s]")
    if (sBar == 0) (0.0, 0.0)
    else if (sBar == s) (h.toDouble, h.toDouble)
    else {
      val chi2a = HypothesisTest.criticalValue(alpha, s - 1)
      val base = h.toDouble * sBar / s
      val spread = base * math.sqrt(chi2a * (s - sBar) / (h.toDouble * sBar))
      (math.max(0.0, base - spread), math.min(h.toDouble, base + spread))
    }
  }

  /** Coverage bounds (Eqs 22–23) for a bin with estimated coverage `beta`.
    *
    * Exact coverages (0 or 1) are certain; non-passing bins (h < m) get the
    * one-point / all-but-one-point bounds; passing bins use Theorem 2 with
    * a = floor(beta*s) fully covered and b = ceil(beta*s) partially covered
    * sub-bins.
    *
    * @return (betaLow, betaHigh)
    */
  def coverageBounds(beta: Double, h: Long, u: Long, m: Long, alpha: Double): (Double, Double) = {
    if (beta <= 0.0 || beta >= 1.0) (math.max(0.0, math.min(1.0, beta)), math.max(0.0, math.min(1.0, beta)))
    else if (h <= 0) (0.0, 1.0)
    else if (h < m) (1.0 / h, 1.0 - 1.0 / h)
    else {
      val s = HypothesisTest.subBins(u)
      if (s < 2) (1.0 / h, 1.0 - 1.0 / h)
      else {
        val a = math.max(0, math.min(s - 1, math.floor(beta * s).toInt))
        val b = math.max(1, math.min(s, math.ceil(beta * s).toInt))
        val lo = partialCountBounds(h, s, a, alpha)._1 / h
        val hi = partialCountBounds(h, s, b, alpha)._2 / h
        (math.max(0.0, math.min(beta, lo)), math.min(1.0, math.max(beta, hi)))
      }
    }
  }
}
