package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** IDEBench-style dataset scale-up (used by the paper for the 1-billion-row
  * experiments and by its Fig 10(d) real-vs-synthetic comparison).
  *
  * IDEBench models each numeric column with normalisation + Gaussians; we
  * fit per-column mean/std + the numeric correlation matrix on a sample,
  * then generate N rows as a correlated Gaussian draw (via Cholesky),
  * clipped to the observed range. Categorical columns are resampled from
  * their empirical frequencies, null fractions are preserved. The "real"
  * spikiness of the source data is deliberately lost — that is the point of
  * Fig 10(d).
  */
object IdeBenchLite {

  def scaleUp(source: DataFrame, targetRows: Long, seed: Long = 23, fitRows: Int = 20000): DataFrame = {
    val spark = source.sparkSession
    val fields = source.schema.fields
    val numIdx = fields.zipWithIndex.collect {
      case (f, i) if f.dataType != StringType => i
    }
    val catIdx = fields.zipWithIndex.collect { case (f, i) if f.dataType == StringType => i }

    val total = source.count()
    val sample = repro.util.Sampling.collectRows(source, fitRows, seed, total)
    require(sample.nonEmpty, "empty fit sample")

    // Per-column stats on the sample (nulls excluded).
    val nCols = fields.length
    val nullFrac = Array.tabulate(nCols)(c => sample.count(_.isNullAt(c)).toDouble / sample.length)
    val numeric = numIdx.map { c =>
      val vs = sample.filterNot(_.isNullAt(c)).map(r => toDouble(r.get(c)))
      val mean = if (vs.isEmpty) 0.0 else vs.sum / vs.length
      val std = if (vs.length < 2) 1.0 else math.sqrt(vs.map(v => (v - mean) * (v - mean)).sum / (vs.length - 1))
      val mn = if (vs.isEmpty) 0.0 else vs.min
      val mx = if (vs.isEmpty) 1.0 else vs.max
      (c, mean, math.max(std, 1e-9), mn, mx)
    }

    // Correlation matrix of standardised numerics (null -> 0 after standardising).
    val p = numeric.length
    val stdRows = sample.map { r =>
      numeric.map { case (c, mean, std, _, _) =>
        if (r.isNullAt(c)) 0.0 else (toDouble(r.get(c)) - mean) / std
      }
    }
    val corr = Array.tabulate(p, p) { (a, b) =>
      if (a == b) 1.0
      else {
        val s = stdRows.map(row => row(a) * row(b)).sum / stdRows.length
        math.max(-0.99, math.min(0.99, s))
      }
    }
    val chol = cholesky(corr)

    // Categorical empirical distributions.
    val catDists = catIdx.map { c =>
      val vs = sample.filterNot(_.isNullAt(c)).map(_.get(c).toString)
      val freq = vs.groupBy(identity).view.mapValues(_.length.toDouble / math.max(1, vs.length)).toSeq.sortBy(-_._2)
      val values = freq.map(_._1).toArray
      val cum = freq.map(_._2).scanLeft(0.0)(_ + _).tail.toArray
      (c, values, cum)
    }

    // Generate: iid standard normals z_0..z_{p-1}, correlate via L.
    val zCols = (0 until p).map(a => randn(seed + 100 + a).as(s"__z$a"))
    val df = spark.range(targetRows).toDF("id").select((col("id") +: zCols).toIndexedSeq: _*)

    val outCols = fields.zipWithIndex.map { case (f, c) =>
      val numPos = numIdx.indexOf(c)
      val raw: org.apache.spark.sql.Column =
        if (numPos >= 0) {
          val (_, mean, std, mn, mx) = numeric(numPos)
          val corrZ = (0 to numPos)
            .map(l => col(s"__z$l") * chol(numPos)(l))
            .reduce(_ + _)
          val v = least(lit(mx), greatest(lit(mn), lit(mean) + corrZ * std))
          castBack(v, f.dataType)
        } else {
          val (_, values, cum) = catDists(catIdx.indexOf(c) match { case k => k })
          if (values.isEmpty) lit(null).cast(StringType)
          else {
            val u = rand(seed + 300 + c)
            // Inverse-CDF via a when-chain over the (small) dictionary.
            values.zipWithIndex.drop(1).foldLeft(when(u < cum(0), values(0))) {
              case (acc, (v, k)) => acc.when(u < cum(k), v)
            }.otherwise(values.last)
          }
        }
      val withNulls =
        if (nullFrac(c) > 0) when(rand(seed + 600 + c) < nullFrac(c), lit(null)).otherwise(raw)
        else raw
      withNulls.as(f.name)
    }
    df.select(outCols.toIndexedSeq: _*)
  }

  private def toDouble(v: Any): Double = v match {
    case n: Number => n.doubleValue
    case b: Boolean => if (b) 1.0 else 0.0
    case d: java.sql.Date => d.toLocalDate.toEpochDay.toDouble
    case t: java.sql.Timestamp => t.getTime / 1000.0
    case other => throw new IllegalArgumentException(s"non-numeric $other")
  }

  private def castBack(c: org.apache.spark.sql.Column, dt: DataType): org.apache.spark.sql.Column = dt match {
    case IntegerType => round(c, 0).cast(IntegerType)
    case LongType    => round(c, 0).cast(LongType)
    case ShortType | ByteType => round(c, 0).cast(IntegerType)
    case _           => round(c, 4)
  }

  /** Cholesky factor of a symmetric PSD matrix with diagonal jitter. */
  private[data] def cholesky(a: Array[Array[Double]]): Array[Array[Double]] = {
    val n = a.length
    val l = Array.fill(n)(new Array[Double](n))
    for (i <- 0 until n; j <- 0 to i) {
      var s = 0.0
      for (k <- 0 until j) s += l(i)(k) * l(j)(k)
      if (i == j) {
        val d = a(i)(i) - s
        l(i)(j) = math.sqrt(math.max(d, 1e-6))
      } else {
        l(i)(j) = (a(i)(j) - s) / l(j)(j)
      }
    }
    l
  }
}
