package repro.util

import org.apache.spark.sql.functions._
import repro.SparkSpec

class SamplingSpec extends SparkSpec {

  test("collectRows returns at most k rows and is deterministic") {
    val df = spark.range(50000).toDF("id")
    val a = Sampling.collectRows(df, 1000, seed = 5, totalRows = 50000)
    val b = Sampling.collectRows(df, 1000, seed = 5, totalRows = 50000)
    assert(a.length == 1000)
    assert(a.map(_.getLong(0)).toSeq == b.map(_.getLong(0)).toSeq)
  }

  test("collectRows is unbiased for ordered data (no LIMIT truncation)") {
    // A LIMIT-based sample of spark.range would only see the first
    // partitions; the mean id would be far below N/2.
    val n = 100000L
    val df = spark.range(n).toDF("id")
    val rows = Sampling.collectRows(df, 2000, seed = 9, totalRows = n)
    val mean = rows.map(_.getLong(0)).sum.toDouble / rows.length
    assert(math.abs(mean - n / 2.0) < n * 0.05, s"mean=$mean")
    val max = rows.map(_.getLong(0)).max
    assert(max > n * 0.9, s"max=$max — tail never sampled")
  }

  test("collectRows returns everything when k >= total") {
    val df = spark.range(500).toDF("id")
    val rows = Sampling.collectRows(df, 1000, seed = 3, totalRows = 500)
    assert(rows.length == 500)
  }

  test("different seeds give different samples") {
    val df = spark.range(50000).select(col("id"), rand(1).as("v"))
    val a = Sampling.collectRows(df, 500, seed = 1, totalRows = 50000).map(_.getLong(0)).toSet
    val b = Sampling.collectRows(df, 500, seed = 2, totalRows = 50000).map(_.getLong(0)).toSet
    assert((a -- b).nonEmpty)
  }
}
