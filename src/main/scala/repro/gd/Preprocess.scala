package repro.gd

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** How a column maps between its original domain and the GD integer domain. */
sealed trait ColKind

/** Affine numeric encoding: gd = round(orig * scale) - minScaled, so
  * orig = (gd + minScaled) / scale. `scale` is a power of ten chosen so all
  * observed values become integral (float-to-int conversion, §3).
  */
final case class NumericCol(scale: Long, minScaled: Long) extends ColKind

/** Frequency-ranked dictionary encoding: the most common value gets code 0,
  * the second most common code 1, etc. (§3).
  */
final case class CategoricalCol(dict: Array[String]) extends ColKind

/** Per-column pre-processing spec — enough to transform query literals into
  * the GD domain (§5.1) and to inverse-transform query results.
  */
final case class ColumnSpec(name: String, kind: ColKind, nullCount: Long) {
  def isCategorical: Boolean = kind.isInstanceOf[CategoricalCol]

  /** Transform an original-domain literal to the GD domain. Categorical
    * literals not in the dictionary map to -1 (matches nothing).
    */
  def toGd(literal: Any): Double = kind match {
    case NumericCol(scale, minScaled) =>
      val v = literal match {
        case n: Number => n.doubleValue
        case s: String => s.toDouble
        case other     => throw new IllegalArgumentException(s"bad literal $other for numeric $name")
      }
      math.rint(v * scale) - minScaled
    case CategoricalCol(dict) =>
      val s = literal.toString
      dict.indexOf(s).toDouble
  }

  /** Inverse transform a GD-domain value back to the original domain.
    * Only meaningful for numeric columns (categorical results are decoded
    * via the dictionary).
    */
  def fromGd(v: Double): Double = kind match {
    case NumericCol(scale, minScaled) => (v + minScaled) / scale
    case CategoricalCol(_)            => v
  }

  /** Inverse of a GD-domain sum of `cnt` values (affine shift scales with
    * the number of terms).
    */
  def fromGdSum(sum: Double, cnt: Double): Double = kind match {
    case NumericCol(scale, minScaled) => (sum + cnt * minScaled) / scale
    case CategoricalCol(_)            => sum
  }

  /** Inverse of a GD-domain variance (affine shift cancels; scale squares). */
  def fromGdVar(variance: Double): Double = kind match {
    case NumericCol(scale, _) => variance / (scale.toDouble * scale)
    case CategoricalCol(_)    => variance
  }
}

/** GreedyGD pre-processing (§3): per-column, type-driven lossless transforms
  * producing a DataFrame of nullable LongType columns plus the specs needed
  * to move literals/results between domains. Implemented as DataFrame
  * aggregations + projections so arbitrarily large inputs stream through.
  */
object Preprocess {

  final case class Result(df: DataFrame, specs: Array[ColumnSpec])

  /** Max decimal places probed during float-to-int conversion. */
  private val MaxDecimals = 6

  /** Distinct-count guard for dictionary encoding. */
  private val MaxDictSize = 100000

  def run(df: DataFrame): Result = {
    val specs = fit(df)
    Result(apply(df, specs), specs)
  }

  /** One aggregation pass for numeric stats + one small job per categorical
    * column for its frequency-ranked dictionary.
    */
  def fit(df: DataFrame): Array[ColumnSpec] = {
    val fields = df.schema.fields
    // Numeric stats: for every column, nullCount; for fractional ones also
    // the smallest power of ten making all values integral, and the min.
    val aggs = fields.flatMap { f =>
      val c = col(f.name)
      val base = Seq(sum(when(c.isNull, 1L).otherwise(0L)).as(s"${f.name}__nulls"))
      f.dataType match {
        case DoubleType | FloatType | _: DecimalType =>
          base ++ (0 to MaxDecimals).map { p =>
            val scaled = c.cast(DoubleType) * math.pow(10, p)
            max(abs(scaled - round(scaled))).as(s"${f.name}__frac$p")
          } :+ min(c.cast(DoubleType)).as(s"${f.name}__min")
        case ByteType | ShortType | IntegerType | LongType | BooleanType =>
          base :+ min(numericAsLong(f).cast(DoubleType)).as(s"${f.name}__min")
        case DateType =>
          base :+ min(datediff(c, lit("1970-01-01").cast(DateType)).cast(DoubleType)).as(s"${f.name}__min")
        case TimestampType =>
          base :+ min(unix_timestamp(c).cast(DoubleType)).as(s"${f.name}__min")
        case StringType => base
        case other => throw new IllegalArgumentException(s"unsupported type $other for ${f.name}")
      }
    }
    val row = df.agg(aggs.head, aggs.tail: _*).collect()(0)

    fields.map { f =>
      val nulls = Option(row.getAs[Long](s"${f.name}__nulls")).getOrElse(0L)
      f.dataType match {
        case StringType =>
          val dict = df
            .filter(col(f.name).isNotNull)
            .groupBy(col(f.name)).count()
            .orderBy(desc("count"), col(f.name))
            .limit(MaxDictSize)
            .collect()
            .map(_.getString(0))
          ColumnSpec(f.name, CategoricalCol(dict), nulls)
        case DoubleType | FloatType | _: DecimalType =>
          val p = (0 to MaxDecimals)
            .find { p =>
              val m = row.getAs[Any](s"${f.name}__frac$p")
              m == null || math.abs(m.asInstanceOf[Double]) < 1e-6
            }
            .getOrElse(MaxDecimals)
          val scale = math.pow(10, p).toLong
          val mn = Option(row.getAs[Any](s"${f.name}__min")).map(_.asInstanceOf[Double]).getOrElse(0.0)
          ColumnSpec(f.name, NumericCol(scale, math.rint(mn * scale).toLong), nulls)
        case _ =>
          val mn = Option(row.getAs[Any](s"${f.name}__min")).map(_.asInstanceOf[Double]).getOrElse(0.0)
          ColumnSpec(f.name, NumericCol(1L, math.rint(mn).toLong), nulls)
      }
    }
  }

  /** Apply fitted specs: every column becomes a nullable LongType column in
    * the GD domain (missing values stay null; the null count lives in the
    * spec — the paper's "encoding missing values").
    */
  def apply(df: DataFrame, specs: Array[ColumnSpec]): DataFrame = {
    val fields = df.schema.fields
    val cols = fields.zip(specs).map { case (f, spec) =>
      spec.kind match {
        case NumericCol(scale, minScaled) =>
          (round(numericAsLong(f).cast(DoubleType) * scale) - minScaled).cast(LongType).as(f.name)
        case CategoricalCol(dict) =>
          val lookup = dict.zipWithIndex.toMap
          val fn = udf((s: String) => if (s == null) None else lookup.get(s).map(_.toLong))
          fn(col(f.name)).as(f.name)
      }
    }
    df.select(cols.toIndexedSeq: _*)
  }

  /** Numeric-ish column as a raw Long-compatible expression (dates become
    * epoch days, timestamps epoch seconds, booleans 0/1).
    */
  private def numericAsLong(f: StructField): Column = f.dataType match {
    case DateType      => datediff(col(f.name), lit("1970-01-01").cast(DateType))
    case TimestampType => unix_timestamp(col(f.name))
    case BooleanType   => col(f.name).cast(IntegerType)
    case _             => col(f.name)
  }
}
