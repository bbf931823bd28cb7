package repro.util

import org.apache.spark.sql.{DataFrame, Row}

import scala.util.Random

/** Unbiased deterministic sampling helpers.
  *
  * `df.sample(frac).limit(k)` is NOT a uniform sample: LIMIT takes the
  * first k rows, i.e. the earliest partitions — badly biased for
  * time-ordered data. We oversample slightly, collect, then take a
  * seed-deterministic shuffle prefix.
  */
object Sampling {

  def collectRows(df: DataFrame, k: Int, seed: Long, totalRows: Long): Array[Row] = {
    val frac = math.min(1.0, k.toDouble / math.max(1L, totalRows) * 1.15)
    val rows =
      if (frac >= 1.0) df.collect()
      else df.sample(withReplacement = false, frac, seed).collect()
    if (rows.length <= k) rows
    else new Random(seed).shuffle(rows.toVector).take(k).toArray
  }
}
