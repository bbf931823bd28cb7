package repro.core

/** Closed integer intervals over the GD domain and predicate coverage
  * estimation (§5.2).
  *
  * Because GD-domain values are integers, every condition normalises to a
  * union of closed intervals: `x < v` becomes `[-inf, v-1]`, `x != v`
  * becomes `[-inf, v-1] ∪ [v+1, +inf]`, etc. Same-column condition groups
  * (the paper's "delayed transformation" consolidation) are then plain
  * interval intersections/unions.
  */
final case class IntervalSet(ivs: List[(Double, Double)]) {
  // invariant: sorted, disjoint, non-adjacent (gap >= 1 in integer domain)

  def isEmpty: Boolean = ivs.isEmpty

  def union(other: IntervalSet): IntervalSet =
    IntervalSet.normalise(ivs ++ other.ivs)

  def intersect(other: IntervalSet): IntervalSet = {
    val out = for {
      (a1, b1) <- ivs
      (a2, b2) <- other.ivs
      lo = math.max(a1, a2)
      hi = math.min(b1, b2)
      if lo <= hi
    } yield (lo, hi)
    IntervalSet.normalise(out)
  }

  def contains(x: Double): Boolean = ivs.exists { case (a, b) => x >= a && x <= b }

  /** Total overlap measure with [lo, hi] counting integer points. */
  def overlapPoints(lo: Double, hi: Double): Double =
    ivs.map { case (a, b) =>
      val l = math.max(a, lo); val h = math.min(b, hi)
      if (l <= h) h - l + 1 else 0.0
    }.sum
}

object IntervalSet {
  val NegInf: Double = -1e18
  val PosInf: Double = 1e18

  val empty: IntervalSet = IntervalSet(Nil)
  val full: IntervalSet = IntervalSet(List((NegInf, PosInf)))

  def normalise(raw: List[(Double, Double)]): IntervalSet = {
    val sorted = raw.filter { case (a, b) => a <= b }.sortBy(_._1)
    val merged = sorted.foldLeft(List.empty[(Double, Double)]) {
      case (Nil, iv) => List(iv)
      case ((a, b) :: rest, (a2, b2)) =>
        if (a2 <= b + 1) (a, math.max(b, b2)) :: rest // adjacent integers merge
        else (a2, b2) :: (a, b) :: rest
    }
    IntervalSet(merged.reverse)
  }

  /** Normalise a single GD-domain condition to an interval set. The GD
    * value `v` may be fractional when a literal falls between domain values
    * (e.g. a raw-domain literal that does not scale to an exact integer);
    * floors/ceils keep the semantics exact over integers.
    */
  def ofCond(op: Op, v: Double): IntervalSet = op match {
    case Op.Lt => IntervalSet(List((NegInf, math.ceil(v) - 1)))
    case Op.Le => IntervalSet(List((NegInf, math.floor(v))))
    case Op.Gt => IntervalSet(List((math.floor(v) + 1, PosInf)))
    case Op.Ge => IntervalSet(List((math.ceil(v), PosInf)))
    case Op.Eq =>
      if (v == math.rint(v)) IntervalSet(List((v, v))) else empty
    case Op.Ne =>
      if (v == math.rint(v)) normalise(List((NegInf, v - 1), (v + 1, PosInf))) else full
  }
}

/** Coverage (Eq 14): per-bin probability that a point satisfies a predicate
  * condition set, plus bounds (Eqs 15–16, 22–23).
  */
object Coverage {

  final case class Vec(est: Array[Double], lo: Array[Double], hi: Array[Double])

  /** Coverage of `set` over every bin of `meta`, with bounds.
    *
    * Eq 15/16 case analysis per bin with extrema [vMin, vMax], u uniques:
    *  - no overlap with [vMin, vMax]           -> 0
    *  - set covers all integer points of bin   -> 1
    *  - u == 1                                 -> 0/1 (above)
    *  - u == 2                                 -> (#extrema covered)/2
    *  - point (equality) overlap only          -> (#points covered)/u
    *  - otherwise                              -> covered fraction of span
    */
  def coverage(set: IntervalSet, meta: DimMeta, m: Long, alpha: Double): Vec = {
    val k = meta.k
    val est = new Array[Double](k)
    val lo = new Array[Double](k)
    val hi = new Array[Double](k)
    var t = 0
    while (t < k) {
      val b = binCoverage(set, meta.vMin(t), meta.vMax(t), meta.unique(t))
      est(t) = b
      val (bl, bh) = Theorems.coverageBounds(b, meta.counts(t), meta.unique(t), m, alpha)
      lo(t) = bl
      hi(t) = bh
      t += 1
    }
    Vec(est, lo, hi)
  }

  /** Estimated coverage of one bin (no bounds). */
  def binCoverage(set: IntervalSet, vMin: Double, vMax: Double, u: Long): Double = {
    if (u <= 0) return 0.0
    val span = vMax - vMin
    val overlap = set.overlapPoints(vMin, vMax)
    if (overlap <= 0) 0.0
    else if (overlap >= span + 1) 1.0 // all integer points covered
    else if (u == 1) { if (set.contains(vMin)) 1.0 else 0.0 }
    else if (u == 2) {
      val c = (if (set.contains(vMin)) 1 else 0) + (if (set.contains(vMax)) 1 else 0)
      c / 2.0
    } else {
      // Mixed point/range overlap: fraction of the bin's integer span. This
      // is the paper's f_t(P) with the span measured over [vMin, vMax].
      val f = overlap / (span + 1)
      // Pure single-point (equality) overlap is better served by 1/u (Eq 15).
      val isPointOnly = set.ivs.forall { case (a, b) =>
        b < vMin || a > vMax || a == b
      }
      val pts = set.ivs.count { case (a, b) => a == b && a >= vMin && a <= vMax }
      if (isPointOnly && pts > 0) math.min(1.0, pts.toDouble / u)
      else math.min(1.0, math.max(0.0, f))
    }
  }
}
