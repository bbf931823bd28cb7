package repro.workload

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.types.StringType
import repro.core._

import scala.util.Random

/** Random query generation with a minimum-selectivity floor (§6: 100
  * single-predicate COUNT/SUM/AVG queries at selectivity >= 1e-5 for the
  * initial experiments; 1–5 predicates over all seven aggregations at
  * >= 1e-6 for the scaled-up experiments).
  */
object QueryGen {

  /** Per-column sampling profile driving literal selection. */
  final case class ColProfile(name: String, isCategorical: Boolean, quantiles: Array[Double], values: Array[String])

  final case class Profile(cols: Array[ColProfile]) {
    def numeric: Array[ColProfile] = cols.filterNot(_.isCategorical)
    def categorical: Array[ColProfile] = cols.filter(_.isCategorical)
  }

  /** Profile from a small collected sample of the original DataFrame. */
  def profile(df: DataFrame, sampleRows: Int = 4000, seed: Long = 5): Profile = {
    val total = df.count()
    val rows = repro.util.Sampling.collectRows(df, sampleRows, seed, total)
    val fields = df.schema.fields
    Profile(fields.zipWithIndex.map { case (f, c) =>
      if (f.dataType == StringType) {
        val vs = rows.filterNot(_.isNullAt(c)).map(_.get(c).toString)
        val top = vs.groupBy(identity).toSeq.sortBy(-_._2.length).take(50).map(_._1).toArray
        ColProfile(f.name, isCategorical = true, Array.empty, top)
      } else {
        val vs = rows.filterNot(_.isNullAt(c)).map(r => anyToDouble(r.get(c))).sorted
        val qs =
          if (vs.isEmpty) Array(0.0, 1.0)
          else Array.tabulate(101)(q => vs(math.min(vs.length - 1, q * vs.length / 100)))
        ColProfile(f.name, isCategorical = false, qs, Array.empty)
      }
    })
  }

  private def anyToDouble(v: Any): Double = v match {
    case n: Number  => n.doubleValue
    case b: Boolean => if (b) 1.0 else 0.0
    case other      => throw new IllegalArgumentException(s"non-numeric $other")
  }

  /** Generate `count` queries whose exact predicate selectivity is at least
    * `minSelectivity`, validated against the ground truth.
    */
  def generate(
      p: Profile,
      gt: GroundTruth,
      nRows: Long,
      count: Int,
      aggs: Seq[AggFn],
      maxPreds: Int,
      minSelectivity: Double,
      seed: Long,
      orShare: Double = 0.2
  ): Seq[Query] = {
    val rng = new Random(seed)
    val out = scala.collection.mutable.ArrayBuffer.empty[Query]
    val floor = math.max(1L, (minSelectivity * nRows).toLong)
    var attempts = 0
    val maxAttempts = count * 60
    while (out.length < count && attempts < maxAttempts) {
      attempts += 1
      val q = candidate(p, rng, aggs, maxPreds, orShare)
      val sel = gt.count(q.where.map(_.toSql))
      if (sel >= floor) {
        // MIN/MAX/MEDIAN/AVG/SUM/VAR also need a non-null exact answer.
        gt.answer(q) match {
          case Some(t) if !t.isNaN && !t.isInfinite => out += q
          case _                                    => ()
        }
      }
    }
    out.toSeq
  }

  /** One random query candidate (selectivity not yet validated). */
  def candidate(p: Profile, rng: Random, aggs: Seq[AggFn], maxPreds: Int, orShare: Double): Query = {
    val numeric = p.numeric
    require(numeric.nonEmpty, "need at least one numeric column")
    val agg = aggs(rng.nextInt(aggs.length))
    val aggCol = numeric(rng.nextInt(numeric.length)).name
    val nPreds = 1 + rng.nextInt(maxPreds)
    val conds = (0 until nPreds).map(_ => randomCond(p, rng)).toList
    val where =
      if (conds.length == 1) conds.head
      else if (rng.nextDouble() < orShare) Or(conds)
      else And(conds)
    Query(agg, aggCol, Some(where))
  }

  private def randomCond(p: Profile, rng: Random): Cond = {
    val c = p.cols(rng.nextInt(p.cols.length))
    if (c.isCategorical && c.values.nonEmpty) {
      val op = if (rng.nextDouble() < 0.8) Op.Eq else Op.Ne
      // Skew toward frequent values so equality predicates keep selectivity.
      val idx = math.min(c.values.length - 1, math.abs(rng.nextGaussian() * c.values.length / 4).toInt)
      Cond(c.name, op, c.values(idx))
    } else if (!c.isCategorical) {
      val ops = Seq(Op.Lt, Op.Le, Op.Gt, Op.Ge)
      val op = ops(rng.nextInt(ops.length))
      val q = 5 + rng.nextInt(91) // quantile in [5, 95]
      Cond(c.name, op, c.quantiles(q))
    } else randomCond(p, rng) // categorical with empty profile: resample
  }
}
