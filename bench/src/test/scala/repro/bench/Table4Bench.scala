package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.workload.Experiments

/** Table 4: the 11 evaluation datasets — rows, columns, raw size.
  *
  * Ours are synthetic stand-ins generated at bench scale (sf = 0.01); the
  * paper's full-size values are printed alongside. Column counts must match
  * exactly; row counts and sizes scale with sf.
  */
class Table4Bench extends SparkSpec {

  test("Table 4: dataset inventory at bench scale vs paper") {
    val sf = 0.01
    println(f"\n=== Table 4 [sf=$sf] ===")
    println(f"${"dataset"}%-10s | ${"rows"}%9s ${"cols"}%5s ${"size MB"}%8s | ${"paper rows"}%10s ${"cols"}%5s ${"MB"}%7s")
    val stats = Datasets.all.map(d => Experiments.datasetStats(spark, d.name, sf))
    for (s <- stats) {
      println(f"${s.name}%-10s | ${s.rows}%9d ${s.cols}%5d ${s.sizeMB}%8.1f | ${s.paperRows}%10d ${s.paperCols}%5d ${s.paperSizeMB}%7.1f")
      assert(s.cols == s.paperCols, s"${s.name}: column count must match the paper")
      assert(s.rows == math.max(20000L, (s.paperRows * sf).toLong), s"${s.name}: row scaling")
      assert(s.sizeMB > 0)
    }
    // Relative size ordering should roughly track the paper (wide/large
    // datasets remain the biggest at any scale).
    val bySize = stats.sortBy(-_.sizeMB).map(_.name)
    assert(bySize.take(4).contains("flights"))
    assert(bySize.take(4).contains("taxis"))
  }
}
