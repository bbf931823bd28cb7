package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.gd.{ColumnSpec, NumericCol}

class ModelSpec extends AnyFunSuite {

  private val meta = DimMeta(
    edges = Array(0.0, 10.0, 20.0, 40.0),
    vMin = Array(0.0, 10.0, 21.0),
    vMax = Array(9.0, 19.0, 39.0),
    unique = Array(10L, 10L, 19L),
    counts = Array(100L, 50L, 200L)
  )

  test("DimMeta validates array shapes") {
    intercept[IllegalArgumentException] {
      DimMeta(Array(0.0, 1.0), Array(0.0, 0.0), Array(1.0), Array(1L), Array(1L))
    }
  }

  test("binOf finds the containing bin with clamping") {
    assert(meta.binOf(0.0) == 0)
    assert(meta.binOf(9.99) == 0)
    assert(meta.binOf(10.0) == 1)
    assert(meta.binOf(39.0) == 2)
    assert(meta.binOf(40.0) == 2)
    assert(meta.binOf(1e9) == 2)
    assert(meta.binOf(-5.0) == 0)
  }

  test("midpoints derive from vMin/vMax, not edges") {
    assert(meta.midpoints.toSeq == Seq(4.5, 14.5, 30.0))
  }

  test("centreBounds stay within [vMin, vMax] per bin") {
    val (lo, hi) = meta.centreBounds(m = 60, alpha = 0.001)
    for (t <- 0 until meta.k) {
      assert(lo(t) >= meta.vMin(t) - 1e-12, s"bin $t")
      assert(hi(t) <= meta.vMax(t) + 1e-12, s"bin $t")
      assert(lo(t) <= hi(t), s"bin $t")
    }
  }

  test("PairwiseHist pair lookup is order-insensitive; columnIndex validates") {
    val spec = (n: String) => ColumnSpec(n, NumericCol(1, 0), 0)
    val h1 = Array.tabulate(2)(i => Hist1D(i, meta))
    val h2 = Map((1, 0) -> Hist2D(1, 0, meta, meta, Array.fill(3)(Array.fill(3)(1L))))
    val ph = PairwiseHist(1000, 100, 10, 0.001, Array(spec("a"), spec("b")), h1, h2, Array(0L, 0L))
    assert(ph.pair(0, 1).nonEmpty && ph.pair(1, 0).nonEmpty)
    assert(ph.pair(0, 1).get eq ph.pair(1, 0).get)
    assert(ph.columnIndex("b") == 1)
    intercept[IllegalArgumentException](ph.columnIndex("zzz"))
    assert(ph.rho == 0.1)
    assert(ph.d == 2)
  }

  test("parentMap maps refined bins to their 1-d parents") {
    val oneD = Hist1D(0, DimMeta(Array(0.0, 20.0, 40.0), Array(0.0, 20.0), Array(19.0, 39.0), Array(5L, 5L), Array(10L, 10L)))
    val refined = DimMeta(
      edges = Array(0.0, 10.0, 20.0, 40.0),
      vMin = Array(0.0, 10.0, 20.0), vMax = Array(9.0, 19.0, 39.0),
      unique = Array(3L, 3L, 5L), counts = Array(5L, 5L, 10L)
    )
    val h2 = Hist2D(0, 1, refined, refined, Array.fill(3)(Array.fill(3)(0L)))
    assert(h2.parentMap(oneD, 'i').toSeq == Seq(0, 0, 1))
  }
}
