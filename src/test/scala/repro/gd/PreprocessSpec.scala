package repro.gd

import org.apache.spark.sql.Row
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.SparkSpec

class PreprocessSpec extends SparkSpec {

  private lazy val df = {
    import scala.jdk.CollectionConverters._
    val schema = StructType(Seq(
      StructField("d", DoubleType, nullable = true),
      StructField("i", IntegerType, nullable = true),
      StructField("s", StringType, nullable = true),
      StructField("dt", DateType, nullable = true)
    ))
    val rows = Seq(
      Row(10.25, 5, "b", java.sql.Date.valueOf("2020-01-02")),
      Row(10.50, -3, "a", java.sql.Date.valueOf("2020-01-01")),
      Row(11.75, 0, "a", null),
      Row(null, 7, "a", java.sql.Date.valueOf("2020-02-01")),
      Row(12.00, 2, null, java.sql.Date.valueOf("2020-01-15")),
      Row(10.25, 2, "c", java.sql.Date.valueOf("2020-01-02"))
    )
    spark.createDataFrame(rows.asJava, schema)
  }

  private lazy val result = Preprocess.run(df)

  test("float-to-int scale detection picks the smallest sufficient power of ten") {
    val NumericCol(scale, _) = result.specs(0).kind: @unchecked
    assert(scale == 100L) // .25 steps need 2 decimals
  }

  test("minimum-value subtraction makes the encoded min zero") {
    val mins = result.df.agg(min("d"), min("i"), min("dt")).collect()(0)
    assert(mins.getLong(0) == 0L)
    assert(mins.getLong(1) == 0L)
    assert(mins.getLong(2) == 0L)
  }

  test("integer column gets scale 1 and its min as shift") {
    val NumericCol(scale, minScaled) = result.specs(1).kind: @unchecked
    assert(scale == 1L && minScaled == -3L)
  }

  test("categorical dictionary is frequency-ranked") {
    val CategoricalCol(dict) = result.specs(2).kind: @unchecked
    assert(dict.head == "a") // most frequent first
    assert(dict.toSet == Set("a", "b", "c"))
  }

  test("null counts are recorded per column") {
    assert(result.specs(0).nullCount == 1)
    assert(result.specs(1).nullCount == 0)
    assert(result.specs(2).nullCount == 1)
    assert(result.specs(3).nullCount == 1)
  }

  test("missing values stay null in the GD domain") {
    val nulls = result.df.select(
      sum(when(col("d").isNull, 1).otherwise(0)),
      sum(when(col("s").isNull, 1).otherwise(0))
    ).collect()(0)
    assert(nulls.getLong(0) == 1 && nulls.getLong(1) == 1)
  }

  test("all output columns are nullable LongType") {
    assert(result.df.schema.fields.forall(_.dataType == LongType))
  }

  test("toGd/fromGd invert each other for numeric literals") {
    val spec = result.specs(0)
    for (v <- Seq(10.25, 10.50, 11.75, 12.00)) {
      assert(math.abs(spec.fromGd(spec.toGd(v)) - v) < 1e-9, s"v=$v")
    }
  }

  test("toGd maps categorical literals to dictionary codes") {
    val spec = result.specs(2)
    val CategoricalCol(dict) = spec.kind: @unchecked
    assert(spec.toGd(dict(0)) == 0.0)
    assert(spec.toGd(dict(1)) == 1.0)
    assert(spec.toGd("zzz") == -1.0)
  }

  test("date columns become epoch-day offsets") {
    val spec = result.specs(3)
    val NumericCol(scale, minScaled) = spec.kind: @unchecked
    assert(scale == 1L)
    // 2020-01-01 is epoch day 18262.
    assert(minScaled == 18262L)
    val maxGd = result.df.agg(max("dt")).collect()(0).getLong(0)
    assert(maxGd == 31L) // 2020-02-01 minus 2020-01-01
  }

  test("GD values round-trip the data exactly (lossless pre-processing)") {
    val spec = result.specs(0)
    val gd = result.df.select("d").collect().flatMap(r => if (r.isNullAt(0)) None else Some(r.getLong(0)))
    val orig = df.select("d").collect().flatMap(r => if (r.isNullAt(0)) None else Some(r.getDouble(0)))
    assert(gd.map(spec.fromGd(_)).sorted.toSeq == orig.sorted.toSeq)
  }

  test("fromGdSum scales the affine shift by the count") {
    val spec = ColumnSpec("t", NumericCol(100, 500), 0)
    // three values 6.0, 7.0, 8.0 -> gd 100, 200, 300; sum_gd=600, cnt=3
    assert(math.abs(spec.fromGdSum(600.0, 3.0) - 21.0) < 1e-9)
  }

  test("fromGdVar divides by scale squared") {
    val spec = ColumnSpec("t", NumericCol(10, 123), 0)
    assert(math.abs(spec.fromGdVar(400.0) - 4.0) < 1e-12)
  }

  test("preprocessing a TPC-H-lite table keeps row count and is deterministic") {
    val li = repro.SynthData.lineitem(spark, sf = 0.001, seed = 0)
    val r1 = Preprocess.run(li)
    assert(r1.df.count() == li.count())
    val r2 = Preprocess.run(repro.SynthData.lineitem(spark, sf = 0.001, seed = 0))
    def render(s: ColumnSpec): String = s.kind match {
      case NumericCol(sc, mn)   => s"num($sc,$mn)"
      case CategoricalCol(dict) => s"cat(${dict.mkString("|")})"
    }
    assert(r1.specs.map(render).toSeq == r2.specs.map(render).toSeq)
  }
}
