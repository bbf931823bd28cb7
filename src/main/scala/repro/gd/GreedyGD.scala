package repro.gd

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType

/** Generalized Deduplication with greedy base-bit selection (GreedyGD, [8]).
  *
  * Each row (a "chunk") is split per column into a base part (the most
  * significant bits) and a deviation part (the remaining low bits). Bases
  * are deduplicated into a base table; deviations are stored verbatim with
  * an ID linking them to their base (Fig 3). Compression wins when few
  * distinct bases cover many rows.
  *
  * The deviation bit-widths are chosen greedily: starting from all bits in
  * the base, repeatedly move `BitStep` bits of one column into the deviation
  * if that reduces the estimated storage, until no move helps. The search
  * runs on a collected sample (bit selection is a statistics problem, not a
  * data-volume problem); the chosen split is then applied to the full
  * DataFrame.
  *
  * Nulls are encoded internally as value 0 with all data shifted +1, so the
  * base/deviation split is total and lossless.
  */
object GreedyGD {

  /** Bits moved to the deviation per greedy step. */
  val BitStep = 4

  final case class Config(devBits: Array[Int], totalBits: Array[Int]) {
    def baseMask(c: Int): Long = if (devBits(c) >= 63) 0L else -1L << devBits(c)
  }

  final case class Compressed(
      bases: DataFrame, // base_id + one masked column per input column
      deviations: DataFrame, // base_id + one low-bits column per input column
      config: Config,
      nBases: Long,
      nRows: Long
  ) {

    /** Estimated compressed size in bytes: deduplicated base table + per-row
      * deviations + per-row base IDs.
      */
    def compressedBytes: Long = {
      val baseBits = config.totalBits.zip(config.devBits).map { case (t, d) => math.max(0, t - d) }.sum
      val devBitsSum = config.devBits.sum
      val idBits = math.max(1, 64 - java.lang.Long.numberOfLeadingZeros(math.max(1L, nBases - 1)))
      nBases * ceilDiv(baseBits, 8) + nRows * (ceilDiv(devBitsSum, 8) + ceilDiv(idBits, 8))
    }

    /** Uncompressed fixed-width size the compression is measured against. */
    def originalBytes: Long = nRows * config.totalBits.map(ceilDiv(_, 8).toLong).sum

    def ratio: Double = originalBytes.toDouble / compressedBytes

    /** Lossless reconstruction: join deviations to bases and OR the parts. */
    def decompress(columns: Array[String]): DataFrame = {
      val joined = deviations.alias("d").join(bases.alias("b"), "gd_base_id")
      val cols = columns.map { c =>
        // shifted-by-one null encoding: 0 means null
        val v = col(s"b.$c") + col(s"d.$c")
        when(v === 0L, lit(null).cast(LongType)).otherwise(v - 1L).as(c)
      }
      joined.select(cols.toIndexedSeq: _*)
    }
  }

  /** Greedy deviation-bit search on a local sample (rows of GD-domain values,
    * null as -1 before shifting). `sample(r)(c)` is row r, column c.
    */
  def chooseConfig(sample: Array[Array[Long]], d: Int): Config = {
    require(sample.nonEmpty, "empty sample")
    val shifted = sample.map(row => row.map(v => if (v < 0) 0L else v + 1L))
    val totalBits = Array.tabulate(d) { c =>
      val mx = shifted.map(_(c)).max
      math.max(1, 64 - java.lang.Long.numberOfLeadingZeros(math.max(1L, mx)))
    }
    val devBits = new Array[Int](d)

    def cost(dev: Array[Int]): Double = {
      val masks = Array.tabulate(d)(c => if (dev(c) >= 63) 0L else -1L << dev(c))
      val seen = new java.util.HashSet[java.util.List[java.lang.Long]]()
      shifted.foreach { row =>
        val key = new java.util.ArrayList[java.lang.Long](d)
        var c = 0
        while (c < d) { key.add(row(c) & masks(c)); c += 1 }
        seen.add(key)
      }
      val nBases = seen.size.toLong
      val baseBits = totalBits.zip(dev).map { case (t, dv) => math.max(0, t - dv) }.sum
      val idBits = math.max(1, 64 - java.lang.Long.numberOfLeadingZeros(math.max(1L, nBases - 1)))
      nBases.toDouble * ceilDiv(baseBits, 8) +
        shifted.length.toDouble * (ceilDiv(dev.sum, 8) + ceilDiv(idBits, 8))
    }

    // Grow the base from empty, as GreedyGD [8] does: start with every bit
    // in the deviation (one base, maximal dedup) and greedily move MSB
    // chunks of a column INTO the base while that lowers storage. Growing
    // from the other end (shrinking a full base) gets stuck immediately on
    // data with several high-entropy columns: no single removal breaks row
    // distinctness, so no move ever looks profitable.
    java.util.Arrays.fill(devBits, 0)
    var c0 = 0
    while (c0 < d) { devBits(c0) = totalBits(c0); c0 += 1 }

    var best = cost(devBits)
    var improved = true
    while (improved) {
      improved = false
      var bestCol = -1
      var bestBits = 0
      var bestCost = best
      var c = 0
      while (c < d) {
        // Candidate moves: promote BitStep MSBs, or the whole column.
        val steps = Seq(math.min(BitStep, devBits(c)), devBits(c)).filter(_ > 0).distinct
        steps.foreach { s =>
          val trial = devBits.clone()
          trial(c) = trial(c) - s
          val tc = cost(trial)
          if (tc < bestCost) { bestCost = tc; bestCol = c; bestBits = s }
        }
        c += 1
      }
      if (bestCol >= 0) {
        devBits(bestCol) -= bestBits
        best = bestCost
        improved = true
      }
    }
    Config(devBits, totalBits)
  }

  /** Compress a GD-domain DataFrame (nullable LongType columns) with the
    * given config. All heavy lifting is DataFrame dataflow: masking is a
    * projection; base dedup is a distinct + id assignment.
    */
  def compress(df: DataFrame, config: Config): Compressed = {
    val cols = df.columns
    val shifted = df.select(cols.map(c => coalesce(col(c) + 1L, lit(0L)).as(c)).toIndexedSeq: _*)

    // Project base (masked MSBs) and deviation (low bits) side by side.
    val projected = shifted.select(
      (cols.zipWithIndex.map { case (c, i) =>
        bitwiseAnd(col(c), config.baseMask(i)).as(s"__b_$c")
      } ++ cols.zipWithIndex.map { case (c, i) =>
        bitwiseAnd(col(c), ~config.baseMask(i)).as(s"__d_$c")
      }).toIndexedSeq: _*
    )
    val bases = projected
      .select(cols.map(c => col(s"__b_$c").as(c)).toIndexedSeq: _*)
      .distinct()
      .withColumn("gd_base_id", monotonically_increasing_id())
      .cache()
    val nBases = bases.count()
    val deviations = projected
      .join(
        bases,
        cols.map(c => projected(s"__b_$c") === bases(c)).reduce(_ && _)
      )
      .select((Seq(col("gd_base_id")) ++ cols.map(c => col(s"__d_$c").as(c))).toIndexedSeq: _*)
    val nRows = df.count()
    Compressed(bases, deviations, config, nBases, nRows)
  }

  /** End-to-end: choose a config from a sample of `df`, then compress. */
  def run(df: DataFrame, sampleRows: Int = 20000, seed: Long = 7): Compressed = {
    val d = df.columns.length
    val local = repro.util.Sampling
      .collectRows(df, sampleRows, seed, df.count())
      .map(r => Array.tabulate(d)(c => if (r.isNullAt(c)) -1L else r.getLong(c)))
    compress(df, chooseConfig(local, d))
  }

  /** Distinct base values per column in the GD domain (null base dropped),
    * sorted — the seeds for PairwiseHist initial bin edges (§3). Capped:
    * Algorithm 1 downsamples seeds to ceil(Ns/M) anyway, so collecting more
    * than a few thousand distinct values would only burn driver memory.
    */
  def baseValues(compressed: Compressed, column: String, maxValues: Int = 10000): Array[Double] = {
    val distinct = compressed.bases.select(col(column)).distinct()
    val cnt = distinct.count()
    val picked =
      if (cnt <= maxValues) distinct
      else distinct.sample(withReplacement = false, maxValues.toDouble / cnt * 1.2, 17)
    picked
      .collect()
      .map(_.getLong(0))
      .filter(_ > 0L)
      .map(v => (v - 1L).toDouble) // undo the +1 null shift
      .sorted
  }

  private def ceilDiv(a: Int, b: Int): Int = (a + b - 1) / b

  /** Bitwise AND helper for a column against a literal mask. */
  private def bitwiseAnd(c: org.apache.spark.sql.Column, mask: Long) =
    c.bitwiseAND(lit(mask))
}
