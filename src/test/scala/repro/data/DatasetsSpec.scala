package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec

class DatasetsSpec extends SparkSpec {

  private val sf = 0.002 // tiny: every dataset floors at 20k rows

  test("all 11 datasets match the paper's column counts (Table 4)") {
    for (d <- Datasets.all) {
      val df = d(spark, sf)
      assert(df.columns.length == d.paperCols, s"${d.name}: ${df.columns.length} vs ${d.paperCols}")
    }
  }

  test("row counts scale with sf and floor at 20k") {
    val power = Datasets.byName("power")
    assert(power.rows(0.002) == 20000L)
    assert(power.rows(0.1) == (2049280L * 0.1).toLong)
    assert(Datasets.byName("power")(spark, 0.002).count() == 20000L)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = Datasets.byName("light")(spark, sf, seed = 3).agg(sum(hash(col("lux"), col("adc")))).collect()(0).getLong(0)
    val b = Datasets.byName("light")(spark, sf, seed = 3).agg(sum(hash(col("lux"), col("adc")))).collect()(0).getLong(0)
    assert(a == b)
  }

  test("power has ~1.25% missing values on sensor columns") {
    val df = Datasets.byName("power")(spark, sf)
    val n = df.count()
    val nulls = df.filter(col("global_active_power").isNull).count()
    val frac = nulls.toDouble / n
    assert(frac > 0.005 && frac < 0.025, s"frac=$frac")
  }

  test("aqua has heavy asynchronous missingness") {
    val df = Datasets.byName("aqua")(spark, sf)
    val n = df.count()
    val frac = df.filter(col("pond1_temp").isNull).count().toDouble / n
    assert(frac > 0.3 && frac < 0.5, s"frac=$frac")
  }

  test("flights cancellation semantics: cancelled rows have null delays") {
    val df = Datasets.byName("flights")(spark, sf)
    assert(df.filter(col("cancelled") === 1 && col("departure_delay").isNotNull).count() == 0)
    assert(df.filter(col("cancelled") === 0 && col("cancellation_reason").isNotNull).count() == 0)
  }

  test("flights air_time correlates with distance") {
    val df = Datasets.byName("flights")(spark, sf)
    val corr = df.stat.corr("distance", "air_time")
    assert(corr > 0.9, s"corr=$corr")
  }

  test("taxis trip_total is the sum of its parts") {
    val df = Datasets.byName("taxis")(spark, sf)
    val bad = df.filter(abs(col("trip_total") - (col("fare") + col("tips") + col("tolls") + col("extras"))) > 0.02).count()
    assert(bad == 0)
  }

  test("basement load columns are spiky: mostly zero with a heavy tail") {
    val df = Datasets.byName("basement")(spark, sf)
    val stats = df.agg(
      avg(when(col("load_1") === 0.0 || col("load_1") < 0.6, 1.0).otherwise(0.0)).as("nearZeroFrac"),
      max(col("load_1")).as("mx")
    ).collect()(0)
    assert(stats.getDouble(0) > 0.5, s"nearZeroFrac=${stats.getDouble(0)}")
    assert(stats.getDouble(1) > 100.0)
  }

  test("categorical columns are strings with zipf-skewed frequencies") {
    val df = Datasets.byName("taxis")(spark, sf)
    val freq = df.groupBy("pickup_area").count().orderBy(desc("count")).collect()
    assert(freq.length > 10)
    assert(freq.head.getLong(1) > 4 * freq.last.getLong(1)) // visible skew
  }

  test("byName rejects unknown datasets") {
    intercept[IllegalArgumentException](Datasets.byName("nope"))
  }

  test("IDEBench-lite preserves schema, row target and null fractions") {
    val src = Datasets.byName("power")(spark, sf)
    val scaled = IdeBenchLite.scaleUp(src, targetRows = 30000, seed = 5, fitRows = 5000)
    assert(scaled.columns.toSeq == src.columns.toSeq)
    assert(scaled.count() == 30000)
    val srcNull = src.filter(col("voltage").isNull).count().toDouble / src.count()
    val outNull = scaled.filter(col("voltage").isNull).count().toDouble / 30000
    assert(math.abs(srcNull - outNull) < 0.01, s"src=$srcNull out=$outNull")
  }

  test("IDEBench-lite gaussianises: moments match, spikiness is lost") {
    val src = Datasets.byName("power")(spark, sf)
    val scaled = IdeBenchLite.scaleUp(src, targetRows = 30000, seed = 5, fitRows = 5000)
    val m1 = src.agg(avg("global_active_power")).collect()(0).getDouble(0)
    val m2 = scaled.agg(avg("global_active_power")).collect()(0).getDouble(0)
    assert(math.abs(m1 - m2) / math.abs(m1) < 0.15, s"src mean=$m1 scaled mean=$m2")
    // Clipped-Gaussian output cannot exceed the observed sample range.
    val mx1 = src.agg(max("sub_metering_1")).collect()(0).getDouble(0)
    val mx2 = scaled.agg(max("sub_metering_1")).collect()(0).getDouble(0)
    assert(mx2 <= mx1 + 1e-9)
  }

  test("IDEBench-lite keeps numeric correlations approximately") {
    val src = Datasets.byName("taxis")(spark, sf)
    val scaled = IdeBenchLite.scaleUp(src, targetRows = 25000, seed = 9, fitRows = 5000)
    val cSrc = src.stat.corr("trip_miles", "fare")
    val cOut = scaled.stat.corr("trip_miles", "fare")
    assert(cSrc > 0.8)
    assert(cOut > 0.5, s"src=$cSrc out=$cOut")
  }

  test("cholesky factorises a simple correlation matrix") {
    val a = Array(Array(1.0, 0.5), Array(0.5, 1.0))
    val l = IdeBenchLite.cholesky(a)
    val rebuilt = Array.tabulate(2, 2)((i, j) => (0 to math.min(i, j)).map(k => l(i)(k) * l(j)(k)).sum)
    for (i <- 0 until 2; j <- 0 until 2) assert(math.abs(rebuilt(i)(j) - a(i)(j)) < 1e-9)
  }
}
