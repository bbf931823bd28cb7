package repro.core

import repro.gd.{CategoricalCol, ColumnSpec}

/** Approximate result with deterministic-style bounds (Table 3). */
final case class AqpResult(estimate: Double, lo: Double, hi: Double) {
  def contains(truth: Double): Boolean = truth >= lo && truth <= hi
  def width: Double = hi - lo
}

/** PairwiseHist query execution (§5).
  *
  * Pipeline per query: transform predicate literals into the GD domain
  * (§5.1), consolidate same-column condition groups into interval sets
  * (delayed transformation, §5.2), compute per-bin coverage + bounds
  * (Eqs 14–16, 22–23), turn coverages into aggregation-column bin
  * weightings via the pair-histogram matrix products (Eqs 27–28), widen for
  * sampling (Eq 29), then evaluate the aggregation (Table 3).
  */
final class Engine(ph: PairwiseHist) {

  private val z98 = 2.3263478740408408 // two-sided 98% normal quantile

  // Weighted-centre bounds (Eq 10) are query-independent; cache per column
  // so the per-query work stays at the paper's few-matrix-multiplications.
  private val centreBoundsCache: Array[(Array[Double], Array[Double])] =
    Array.tabulate(ph.d)(i => ph.hist1d(i).meta.centreBounds(ph.m, ph.alpha))

  // Refined-bin -> 1-d-bin maps are likewise query-independent.
  private val parentCache = scala.collection.mutable.HashMap.empty[(Int, Int), Array[Int]]

  /** Per-1-d-bin probability vector with bounds. */
  private final case class ProbVec(est: Array[Double], lo: Array[Double], hi: Array[Double])

  def run(q: Query): Option[AqpResult] = {
    require(q.groupBy.isEmpty, "use runGroupBy for GROUP BY queries")
    val i = ph.columnIndex(q.aggCol)
    answer(q, i, q.where)
  }

  /** GROUP BY over a categorical column: each group value becomes an extra
    * equality condition (§3 — GROUP BY on any categorical column).
    */
  def runGroupBy(q: Query): Seq[(String, AqpResult)] = {
    val g = q.groupBy.getOrElse(throw new IllegalArgumentException("no GROUP BY column"))
    val gSpec = ph.specs(ph.columnIndex(g))
    val dict = gSpec.kind match {
      case CategoricalCol(d) => d
      case _ => throw new IllegalArgumentException(s"GROUP BY requires a categorical column, got $g")
    }
    val i = ph.columnIndex(q.aggCol)
    dict.toIndexedSeq.flatMap { value =>
      val cond = Cond(g, Op.Eq, value)
      val where = q.where match {
        case Some(w) => And(List(w, cond))
        case None    => cond
      }
      answer(q, i, Some(where)).map(value -> _)
    }
  }

  // ------------------------------------------------------------ pipeline ----

  private def answer(q: Query, i: Int, where: Option[PredTree]): Option[AqpResult] = {
    val meta = ph.hist1d(i).meta
    val k = meta.k
    val p = where match {
      case None    => ProbVec(Array.fill(k)(1.0), Array.fill(k)(1.0), Array.fill(k)(1.0))
      case Some(w) => evalTree(w, i)
    }
    val (wEst, wLo, wHi) = weightings(meta, p)
    val oneD = q.columns == Set(q.aggCol)
    aggregate(q.agg, i, wEst, wLo, wHi, oneD)
  }

  /** Recursive predicate evaluation with same-column consolidation. A bare
    * condition behaves like a one-element AND group.
    */
  private def evalTree(tree: PredTree, i: Int): ProbVec = tree match {
    case c: Cond   => evalNode(isAnd = true, List(c), i)
    case And(kids) => evalNode(isAnd = true, kids, i)
    case Or(kids)  => evalNode(isAnd = false, kids, i)
  }

  private def evalNode(isAnd: Boolean, kids: List[PredTree], i: Int): ProbVec = {
    val (conds, subtrees) = kids.partition(_.isInstanceOf[Cond])
    // Delayed transformation: conditions on the same column directly under
    // one connective are consolidated into a single interval set before the
    // coverage -> weighting transformation (§5.2).
    val condVecs = conds
      .collect { case c: Cond => c }
      .groupBy(_.col)
      .toSeq
      .sortBy(_._1)
      .map { case (colName, cs) =>
        val j = ph.columnIndex(colName)
        val sets = cs.map(c => IntervalSet.ofCond(c.op, ph.specs(j).toGd(c.value)))
        val set = if (isAnd) sets.reduce(_ intersect _) else sets.reduce(_ union _)
        pairProb(i, j, set)
      }
    val subVecs = subtrees.map(st => evalTree(st, i))
    val all = condVecs ++ subVecs
    require(all.nonEmpty, "empty predicate node")
    if (isAnd) all.reduce(combineAnd) else all.reduce(combineOr)
  }

  /** Eq 25 under conditional independence: element-wise product. Bounds are
    * monotone in each factor, so lows multiply with lows.
    */
  private def combineAnd(a: ProbVec, b: ProbVec): ProbVec =
    ProbVec(
      mult(a.est, b.est),
      mult(a.lo, b.lo),
      mult(a.hi, b.hi)
    )

  /** Eq 26: union via 1 - prod(1 - p). */
  private def combineOr(a: ProbVec, b: ProbVec): ProbVec = {
    def or(x: Array[Double], y: Array[Double]) =
      Array.tabulate(x.length)(t => 1.0 - (1.0 - x(t)) * (1.0 - y(t)))
    ProbVec(or(a.est, b.est), or(a.lo, b.lo), or(a.hi, b.hi))
  }

  private def mult(x: Array[Double], y: Array[Double]): Array[Double] =
    Array.tabulate(x.length)(t => x(t) * y(t))

  /** Eq 27: per-1-d-bin probability that a point of aggregation column `i`
    * satisfies the condition set on column `j`, via the (i,j) pair
    * histogram. Same-column conditions (j == i) read the 1-d histogram
    * directly.
    */
  private def pairProb(i: Int, j: Int, set: IntervalSet): ProbVec = {
    val meta1 = ph.hist1d(i).meta
    if (i == j) {
      val cov = Coverage.coverage(set, meta1, ph.m, ph.alpha)
      ProbVec(cov.est, cov.lo, cov.hi)
    } else {
      val pairHist = ph.pair(i, j).getOrElse(
        throw new IllegalStateException(s"missing pair histogram ($i,$j)")
      )
      val predIsI = pairHist.colI == j
      val predMeta = if (predIsI) pairHist.metaI else pairHist.metaJ
      val aggMeta = if (predIsI) pairHist.metaJ else pairHist.metaI
      val cov = Coverage.coverage(set, predMeta, ph.m, ph.alpha)

      // nu = H^(ij) beta over the pair's refined aggregation-dimension bins.
      val kAggRef = aggMeta.k
      def numerator(beta: Array[Double]): Array[Double] = {
        val nu = new Array[Double](kAggRef)
        if (predIsI) {
          var ti = 0
          while (ti < pairHist.metaI.k) {
            val b = beta(ti)
            if (b > 0) {
              val row = pairHist.counts(ti)
              var tj = 0
              while (tj < row.length) { nu(tj) += row(tj) * b; tj += 1 }
            }
            ti += 1
          }
        } else {
          var ti = 0
          while (ti < pairHist.counts.length) {
            val row = pairHist.counts(ti)
            var tj = 0
            while (tj < row.length) {
              val b = beta(tj)
              if (b > 0) nu(ti) += row(tj) * b
              tj += 1
            }
            ti += 1
          }
        }
        nu
      }

      // Sum refined aggregation bins back onto their parent 1-d bins, then
      // divide by the 1-d bin counts (Eq 27).
      val parent = parentCache.getOrElseUpdate(
        (i, j),
        if (predIsI) pairHist.parentMap(ph.hist1d(i), 'j')
        else pairHist.parentMap(ph.hist1d(i), 'i')
      )
      def toProb(beta: Array[Double]): Array[Double] = {
        val nu = numerator(beta)
        val agg = new Array[Double](meta1.k)
        var t = 0
        while (t < nu.length) { agg(parent(t)) += nu(t); t += 1 }
        Array.tabulate(meta1.k) { t =>
          val h = meta1.counts(t)
          if (h <= 0) 0.0 else math.min(1.0, math.max(0.0, agg(t) / h))
        }
      }

      ProbVec(toProb(cov.est), toProb(cov.lo), toProb(cov.hi))
    }
  }

  /** Eq 24 + Eq 29: weightings w = h ⊙ p with sampling-widened bounds.
    *
    * The paper's Eq 29 widens by z * sqrt(beta(1-beta) * (N-Ns)/(N-1));
    * read literally that is a sub-unit count for any bin. We widen by the
    * binomial count standard deviation sqrt(h * beta(1-beta)) times the
    * finite-population factor, which is the variance the surrounding text
    * derives ("variance is estimated according to the Binomial
    * distribution"). Exact bins (beta in {0,1}) are not widened.
    */
  private def weightings(meta: DimMeta, p: ProbVec): (Array[Double], Array[Double], Array[Double]) = {
    val k = meta.k
    val fpc = if (ph.n <= 1) 0.0 else math.max(0.0, (ph.n - ph.nS).toDouble / (ph.n - 1).toDouble)
    val w = new Array[Double](k)
    val wLo = new Array[Double](k)
    val wHi = new Array[Double](k)
    var t = 0
    while (t < k) {
      val h = meta.counts(t).toDouble
      w(t) = h * p.est(t)
      var lo = h * p.lo(t)
      var hi = h * p.hi(t)
      if (fpc > 0) {
        if (p.lo(t) > 0 && p.lo(t) < 1)
          lo -= z98 * math.sqrt(h * p.lo(t) * (1 - p.lo(t)) * fpc)
        if (p.hi(t) > 0 && p.hi(t) < 1)
          hi += z98 * math.sqrt(h * p.hi(t) * (1 - p.hi(t)) * fpc)
      }
      wLo(t) = math.max(0.0, lo)
      wHi(t) = math.min(h, hi)
      t += 1
    }
    (w, wLo, wHi)
  }

  // --------------------------------------------------------- aggregation ----

  private def aggregate(
      fn: AggFn, i: Int,
      w: Array[Double], wLo: Array[Double], wHi: Array[Double],
      oneD: Boolean
  ): Option[AqpResult] = {
    val meta = ph.hist1d(i).meta
    val spec = ph.specs(i)
    val c = meta.midpoints
    val (cLo, cHi) = centreBoundsCache(i)
    val rho = ph.rho
    val nw = norm1(w)

    def ordered(est: Double, lo: Double, hi: Double) =
      Some(AqpResult(est, math.min(lo, est), math.max(hi, est)))

    fn match {
      case AggFn.Count =>
        ordered(nw / rho, norm1(wLo) / rho, norm1(wHi) / rho)

      case AggFn.Sum =>
        if (nw <= 0) return None
        val est = spec.fromGdSum(dot(w, c) / rho, nw / rho)
        // The affine shift scales with the count, so extremise over both
        // count bounds when inverse-transforming the GD-domain sum bounds.
        val counts = Seq(norm1(wLo) / rho, norm1(wHi) / rho)
        val lo = counts.map(spec.fromGdSum(dot(wLo, cLo) / rho, _)).min
        val hi = counts.map(spec.fromGdSum(dot(wHi, cHi) / rho, _)).max
        ordered(est, lo, hi)

      case AggFn.Avg =>
        if (nw <= 0) return None
        val est = spec.fromGd(dot(w, c) / nw)
        val cands = Seq(wLo, wHi).filter(norm1(_) > 0)
        val lo = (cands.map(wc => dot(wc, cLo) / norm1(wc)) :+ (dot(w, c) / nw)).min
        val hi = (cands.map(wc => dot(wc, cHi) / norm1(wc)) :+ (dot(w, c) / nw)).max
        ordered(est, spec.fromGd(lo), spec.fromGd(hi))

      case AggFn.Min => minMax(isMin = true, meta, spec, w, wLo, wHi, oneD)
      case AggFn.Max => minMax(isMin = false, meta, spec, w, wLo, wHi, oneD)

      case AggFn.Median =>
        if (nw <= 0) return None
        val tStar = medianBin(w)
        val est = {
          val below = w.take(tStar).sum
          val f = (nw / 2 - below) / math.max(w(tStar), 1e-12)
          if (meta.unique(tStar) == 2) { if (f < 0.5) meta.vMin(tStar) else meta.vMax(tStar) }
          else meta.vMin(tStar) + (meta.vMax(tStar) - meta.vMin(tStar)) * f
        }
        val cands = Seq(wLo, wHi).filter(norm1(_) > 0)
        val tLo = (cands.map(medianBin) :+ tStar).min
        val tHi = (cands.map(medianBin) :+ tStar).max
        ordered(spec.fromGd(est), spec.fromGd(meta.vMin(tLo)), spec.fromGd(meta.vMax(tHi)))

      case AggFn.Var =>
        if (nw <= 0) return None
        val avg = dot(w, c) / nw
        val est = dot(w, mult(c, c)) / nw - avg * avg
        // Eqs 38-39: per-bin representative points for the bounds.
        val xiLo = Array.tabulate(meta.k) { t =>
          if (meta.vMax(t) < avg) meta.vMax(t)
          else if (meta.vMin(t) > avg) meta.vMin(t)
          else avg
        }
        val xiHi = Array.tabulate(meta.k) { t =>
          if (math.abs(avg - meta.vMin(t)) > math.abs(meta.vMax(t) - avg)) meta.vMin(t)
          else meta.vMax(t)
        }
        def varWith(wc: Array[Double], xi: Array[Double]): Double = {
          val n1 = norm1(wc)
          if (n1 <= 0) est
          else {
            val mu = dot(wc, xi) / n1
            dot(wc, mult(xi, xi)) / n1 - mu * mu
          }
        }
        val lo = math.max(0.0, Seq(wLo, wHi).map(varWith(_, xiLo)).min min est)
        val hi = Seq(wLo, wHi).map(varWith(_, xiHi)).max max est
        ordered(spec.fromGdVar(math.max(0.0, est)), spec.fromGdVar(lo), spec.fromGdVar(hi))
    }
  }

  /** MIN and MAX per Table 3 / Eqs 30–33 (MAX mirrors MIN). */
  private def minMax(
      isMin: Boolean, meta: DimMeta, spec: ColumnSpec,
      w: Array[Double], wLo: Array[Double], wHi: Array[Double], oneD: Boolean
  ): Option[AqpResult] = {
    val k = meta.k
    def firstIdx(v: Array[Double], thresh: Double): Option[Int] = {
      val r = if (isMin) 0 until k else (k - 1) to 0 by -1
      r.find(v(_) > thresh)
    }
    val tEst = firstIdx(w, 0.0).getOrElse(return None)
    def extremeNear(t: Int) = if (isMin) meta.vMin(t) else meta.vMax(t) // estimate side
    def extremeFar(t: Int) = if (isMin) meta.vMax(t) else meta.vMin(t)

    val est =
      if (oneD && meta.unique(tEst) == 2 && w(tEst) < meta.counts(tEst) / 2.0) extremeFar(tEst)
      else extremeNear(tEst)

    // Outer bound: from the widest weightings (wHi), threshold 0 (Eq 31).
    val tOuter = firstIdx(wHi, 0.0).getOrElse(tEst)
    val outer =
      if (oneD && meta.unique(tOuter) == 2 && wHi(tOuter) < meta.counts(tOuter) / 5.0) extremeFar(tOuter)
      else extremeNear(tOuter)

    // Inner bound: first bin confidently non-empty under wLo (Eq 32), with
    // the sub-bin tightening for single-column queries (§5.4.4).
    val inner = firstIdx(wLo, 0.5) match {
      case Some(t) =>
        val u = meta.unique(t)
        val h = meta.counts(t)
        if (oneD && u > 2 && h > ph.m) {
          val s = HypothesisTest.subBins(u)
          val delta = (meta.vMax(t) - meta.vMin(t)) / s
          val a = math.max(0, math.min(s - 1, math.floor(s * wLo(t) / h).toInt))
          if (isMin) meta.vMax(t) - a * delta else meta.vMin(t) + a * delta
        } else extremeFar(t)
      case None =>
        // No confidently non-empty bin: fall back to the farthest possibly
        // non-empty bin so the bound stays conservative.
        val tf = (if (isMin) (k - 1) to 0 by -1 else 0 until k).find(wHi(_) > 0).getOrElse(tEst)
        extremeFar(tf)
    }

    val (lo, hi) = if (isMin) (outer, inner) else (inner, outer)
    Some(AqpResult(spec.fromGd(est), spec.fromGd(math.min(lo, est)), spec.fromGd(math.max(hi, est))))
  }

  private def medianBin(w: Array[Double]): Int = {
    val half = norm1(w) / 2
    var acc = 0.0
    var t = 0
    while (t < w.length) {
      acc += w(t)
      if (acc >= half && w(t) > 0) return t
      t += 1
    }
    w.length - 1
  }

  private def dot(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var t = 0
    while (t < a.length) { s += a(t) * b(t); t += 1 }
    s
  }

  private def norm1(a: Array[Double]): Double = {
    var s = 0.0; var t = 0
    while (t < a.length) { s += a(t); t += 1 }
    s
  }
}
