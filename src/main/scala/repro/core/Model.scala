package repro.core

import repro.gd.ColumnSpec

/** Per-bin metadata along one dimension of a histogram (Fig 4).
  *
  * Arrays are indexed by bin; a histogram with k bins has k+1 edges. For
  * 2-d histograms the metadata along dimension i are marginal over the
  * other dimension (min/max/unique of the points whose i-value falls in
  * bin t, regardless of their j-bin).
  */
final case class DimMeta(
    edges: Array[Double],
    vMin: Array[Double],
    vMax: Array[Double],
    unique: Array[Long],
    counts: Array[Long]
) {
  def k: Int = counts.length
  require(edges.length == k + 1, s"edges=${edges.length} for k=$k bins")
  require(vMin.length == k && vMax.length == k && unique.length == k)

  /** Bin midpoints c_t = (vMin + vMax) / 2 — rederived, never stored. */
  lazy val midpoints: Array[Double] = Array.tabulate(k)(t => (vMin(t) + vMax(t)) / 2)

  /** Weighted-centre bounds per bin (Eq 10) — rederived, never stored. */
  def centreBounds(m: Long, alpha: Double): (Array[Double], Array[Double]) = {
    val lo = new Array[Double](k)
    val hi = new Array[Double](k)
    var t = 0
    while (t < k) {
      val (l, h) = Theorems.weightedCentreBounds(counts(t), unique(t), vMin(t), vMax(t), m, alpha)
      lo(t) = l; hi(t) = h; t += 1
    }
    (lo, hi)
  }

  /** Index of the bin containing `x` (edges half-open, last bin closed). */
  def binOf(x: Double): Int = {
    var lo = 0; var hi = k - 1
    while (lo < hi) {
      val mid = (lo + hi + 1) >>> 1
      if (x >= edges(mid)) lo = mid else hi = mid - 1
    }
    lo
  }
}

/** One-dimensional histogram for a single column (§4). */
final case class Hist1D(col: Int, meta: DimMeta) {
  def k: Int = meta.k
}

/** Two-dimensional histogram for a pair of columns i > j (§4).
  *
  * `counts(ti)(tj)` is the number of sample points with non-null values in
  * both columns falling in bin (ti, tj). `metaI.edges` refines the 1-d
  * edges of column i (splits only add edges), likewise for j.
  */
final case class Hist2D(colI: Int, colJ: Int, metaI: DimMeta, metaJ: DimMeta, counts: Array[Array[Long]]) {
  require(counts.length == metaI.k, s"rows=${counts.length} metaI.k=${metaI.k}")
  require(counts.forall(_.length == metaJ.k))

  /** Map each refined bin of this pair's `dim` to its parent 1-d bin. */
  def parentMap(oneD: Hist1D, dim: Char): Array[Int] = {
    val refined = if (dim == 'i') metaI.edges else metaJ.edges
    val kRef = refined.length - 1
    Array.tabulate(kRef) { t =>
      val centre = (refined(t) + refined(t + 1)) / 2
      oneD.meta.binOf(centre)
    }
  }
}

/** The PairwiseHist synopsis: all 1-d histograms, all pair histograms, and
  * the construction parameters needed at query time (§3, Fig 2).
  *
  * @param n          rows in the full dataset
  * @param nS         rows in the construction sample
  * @param m          minimum bin count for splitting (and the pass marker)
  * @param alpha      hypothesis-test significance
  * @param specs      GD pre-processing specs (literal transformation, §5.1)
  * @param nullCounts per-column null count within the sample
  */
final case class PairwiseHist(
    n: Long,
    nS: Long,
    m: Long,
    alpha: Double,
    specs: Array[ColumnSpec],
    hist1d: Array[Hist1D],
    hist2d: Map[(Int, Int), Hist2D],
    nullCounts: Array[Long]
) {
  def d: Int = hist1d.length

  /** Sampling ratio rho = Ns / N. */
  def rho: Double = nS.toDouble / n

  /** Pair histogram for columns (a, b) in either order. */
  def pair(a: Int, b: Int): Option[Hist2D] =
    hist2d.get((math.max(a, b), math.min(a, b)))

  def columnIndex(name: String): Int = {
    val i = specs.indexWhere(_.name == name)
    require(i >= 0, s"unknown column '$name' (have ${specs.map(_.name).mkString(",")})")
    i
  }
}
