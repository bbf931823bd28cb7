package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic stand-ins for the paper's 11 real-world datasets (Table 4).
  *
  * Each generator is deterministic in (sf, seed) and mimics the shape that
  * drives the paper's results: IoT power data is spiky and heavy-tailed
  * (hard for model-based baselines), sensor data drifts diurnally, Flights
  * and Taxis mix many categorical + numeric columns with missing values.
  * Row counts scale as `max(20k, paperRows * sf)`.
  */
object Datasets {

  final case class DatasetDef(
      name: String,
      paperRows: Long,
      paperCols: Int,
      paperSizeMB: Double,
      gen: (SparkSession, Double, Long) => DataFrame
  ) {
    def rows(sf: Double): Long = math.max(20000L, (paperRows * sf).toLong)
    def apply(spark: SparkSession, sf: Double, seed: Long = 11): DataFrame = gen(spark, sf, seed)
  }

  val all: Seq[DatasetDef] = Seq(
    DatasetDef("aqua", 913465L, 13, 66.7, aqua),
    DatasetDef("basement", 1051200L, 12, 50.5, basement),
    DatasetDef("build", 14381639L, 7, 402.7, build),
    DatasetDef("current", 1051200L, 24, 100.9, current),
    DatasetDef("flights", 5819079L, 32, 756.5, flights),
    DatasetDef("furnace", 1051200L, 12, 50.5, furnace),
    DatasetDef("gas", 928991L, 12, 44.6, gas),
    DatasetDef("light", 405184L, 9, 19.9, light),
    DatasetDef("power", 2049280L, 10, 82.0, power),
    DatasetDef("taxis", 3889032L, 23, 1753.9, taxis),
    DatasetDef("temp", 10553597L, 5, 369.4, temp)
  )

  def byName(name: String): DatasetDef =
    all.find(_.name == name).getOrElse(throw new IllegalArgumentException(s"unknown dataset $name"))

  // ------------------------------------------------------------- helpers ----

  private def rows(paperRows: Long, sf: Double): Long = math.max(20000L, (paperRows * sf).toLong)

  /** Diurnal base signal over a per-row timestamp index. */
  private def diurnal(ts: Column, period: Double, amp: Double): Column =
    sin(ts / period * 2 * math.Pi) * amp

  /** Heavy-tailed non-negative noise: exponential via inverse CDF. */
  private def expTail(seed: Long, mean: Double): Column =
    -log(greatest(rand(seed), lit(1e-12))) * mean

  /** Spiky appliance load: off most of the time, heavy-tailed when on. */
  private def spiky(seed: Long, pOn: Double, onMean: Double): Column =
    when(rand(seed) < pOn, round(expTail(seed + 1000, onMean), 1)).otherwise(0.0)

  /** Zipf-ranked index in [1, n] (rank 1 most likely). The clamp happens in
    * the double domain BEFORE the int cast: the inverse-CDF power blows up
    * for tiny rand() draws and Spark 4's ANSI mode turns the overflow into
    * a runtime error at scale.
    */
  private def zipfIdx(seed: Long, n: Int, alpha: Double): Column = {
    val norm = (1 to math.min(n, 10000)).map(k => 1.0 / math.pow(k, alpha)).sum
    val raw = pow(lit(1.0) / (rand(seed) * norm + 1e-9), lit(1.0 / alpha))
    least(lit(n.toDouble), greatest(lit(1.0), raw)).cast(IntegerType)
  }

  /** Categorical code as a readable string, zipf-ranked. */
  private def zipfCat(seed: Long, n: Int, alpha: Double, prefix: String): Column =
    format_string(s"$prefix%03d", zipfIdx(seed, n, alpha))

  private def nullify(c: Column, seed: Long, p: Double): Column =
    when(rand(seed) < p, lit(null)).otherwise(c)

  // ------------------------------------------------------------ datasets ----

  /** Aquaponics sensors: 4 ponds x 3 sensors + shared timestamp, ~40% nulls
    * from asynchronous sampling (matching the paper's Aqua description).
    */
  def aqua(spark: SparkSession, sf: Double, seed: Long): DataFrame = {
    val base = spark.range(rows(913465L, sf)).withColumn("ts", col("id") * 30)
    val sensors = for {
      pond <- 1 to 4
      (kind, mean, amp) <- Seq(("temp", 26.0, 2.0), ("ph", 7.1, 0.4), ("oxygen", 6.5, 1.0))
    } yield {
      val s = seed + pond * 10 + kind.hashCode % 7
      nullify(
        round(lit(mean) + diurnal(col("ts"), 2880.0 * 30, amp) + rand(s) * amp * 0.3, 2),
        s + 500, 0.4
      ).as(s"pond${pond}_$kind")
    }
    base.select((col("ts") +: sensors).toIndexedSeq: _*)
  }

  /** Basement power: spiky appliance loads (AMPds-style). */
  def basement(spark: SparkSession, sf: Double, seed: Long): DataFrame =
    applianceGrid(spark, rows(1051200L, sf), seed, 11, "load", pOn = 0.08, onMean = 120.0)

  /** Furnace power: diurnal duty cycle + spikes. */
  def furnace(spark: SparkSession, sf: Double, seed: Long): DataFrame = {
    val df = applianceGrid(spark, rows(1051200L, sf), seed + 77, 11, "furnace", pOn = 0.25, onMean = 60.0)
    df
  }

  /** Electric meter currents: 23 spiky correlated channels. */
  def current(spark: SparkSession, sf: Double, seed: Long): DataFrame =
    applianceGrid(spark, rows(1051200L, sf), seed + 155, 23, "amps", pOn = 0.12, onMean = 8.0)

  private def applianceGrid(
      spark: SparkSession, n: Long, seed: Long, channels: Int, prefix: String,
      pOn: Double, onMean: Double
  ): DataFrame = {
    val base = spark.range(n).withColumn("ts", col("id") * 60)
    val chans = (1 to channels).map { ch =>
      val s = seed + ch * 13
      // Shared diurnal envelope makes channels correlated, as in real homes.
      val envelope = (diurnal(col("ts"), 1440.0 * 60, 0.5) + 1.0)
      round(spiky(s, pOn, onMean) * envelope + rand(s + 3) * 0.5, 1).as(s"${prefix}_$ch")
    }
    base.select((col("ts") +: chans).toIndexedSeq: _*)
  }

  /** Smart building: multi-room correlated CO2/temp/humidity drifts + nulls. */
  def build(spark: SparkSession, sf: Double, seed: Long): DataFrame = {
    val base = spark.range(rows(14381639L, sf)).withColumn("ts", col("id") * 5)
    base.select(
      col("ts"),
      zipfCat(seed + 1, 50, 0.8, "room").as("room"),
      nullify(round(lit(420.0) + diurnal(col("ts"), 17280.0 * 5, 120.0) + expTail(seed + 2, 40.0), 1), seed + 12, 0.15).as("co2"),
      nullify(round(lit(22.0) + diurnal(col("ts"), 17280.0 * 5, 3.0) + rand(seed + 3) * 1.5, 2), seed + 13, 0.15).as("temperature"),
      nullify(round(lit(45.0) + diurnal(col("ts"), 17280.0 * 5, 8.0) + rand(seed + 4) * 4.0, 1), seed + 14, 0.15).as("humidity"),
      nullify(round(rand(seed + 5) * 800.0, 0), seed + 15, 0.15).as("light"),
      when(rand(seed + 6) < 0.05, 1).otherwise(0).as("pir")
    )
  }

  /** Home gas sensor array: drifting resistances correlated with humidity. */
  def gas(spark: SparkSession, sf: Double, seed: Long): DataFrame = {
    // Humidity drives every sensor column, so it is materialised first.
    val base = spark.range(rows(928991L, sf)).toDF("id").select(
      col("id").as("ts"),
      round(lit(55.0) + diurnal(col("id"), 86400.0, 10.0) + rand(seed + 1) * 5.0, 2).as("humidity"),
      round(lit(27.0) + diurnal(col("id"), 86400.0, 4.0) + rand(seed + 2) * 1.0, 2).as("temperature"),
      round(rand(seed + 30) * 2.0 + 0.2, 3).as("flow")
    )
    val sensors = (1 to 8).map { k =>
      val s = seed + 10 + k
      round(lit(12.0 + k) - col("humidity") * 0.05 + expTail(s, 1.2) + rand(s + 1) * 0.4, 3).as(s"r$k")
    }
    base.select(
      (Seq(col("ts"), col("humidity"), col("temperature")) ++ sensors :+ col("flow")).toIndexedSeq: _*
    )
  }

  /** IoT light detection: small, mixed discrete/continuous. */
  def light(spark: SparkSession, sf: Double, seed: Long): DataFrame = {
    val base = spark.range(rows(405184L, sf)).withColumn("ts", col("id") * 10)
    val daylight = (diurnal(col("ts"), 8640.0 * 10, 1.0) + 1.0) / 2.0
    base.select(
      col("ts"),
      round(daylight * 900.0 + expTail(seed + 1, 30.0), 1).as("lux"),
      when(daylight > 0.5, 1).otherwise(0).as("is_day"),
      round(lit(24.0) + daylight * 6.0 + rand(seed + 2), 2).as("temperature"),
      round(lit(3.7) - col("id") / 1e7 + rand(seed + 3) * 0.01, 3).as("battery"),
      zipfCat(seed + 4, 5, 1.0, "dev").as("device"),
      round(rand(seed + 5) * 100.0, 1).as("adc"),
      when(rand(seed + 6) < 0.02, 1).otherwise(0).as("motion"),
      round(daylight * 100.0 + rand(seed + 7) * 5.0, 1).as("light_pct")
    )
  }

  /** Household power (the paper's main workload, [54]): diurnal + appliance
    * spikes, correlated intensity/power, 1.25% missing.
    */
  def power(spark: SparkSession, sf: Double, seed: Long): DataFrame = {
    // Two-stage select: gap and voltage feed several output columns, so
    // their random primitives are materialised once (see flights).
    val minuteOfDay = (col("id") % 1440).cast(DoubleType)
    val envelope = sin(minuteOfDay / 1440.0 * 2 * math.Pi - 1.0) * 0.8 + 1.2
    val p = 0.0125 // paper's Power dataset missing-value rate
    val base = spark.range(rows(2049280L, sf)).toDF("id").select(
      col("id"),
      (col("id") * 60).as("ts"),
      round(envelope * 0.9 + spiky(seed + 1, 0.15, 2.5) + rand(seed + 2) * 0.2, 3).as("gap0"),
      round(expTail(seed + 4, 0.12) + 0.05, 3).as("grp0"),
      round(lit(240.0) + diurnal(col("id") * 60, 86400.0, 2.0) + rand(seed + 3) * 3.0, 2).as("volt0"),
      round(rand(seed + 5) * 0.3, 1).as("gi_noise"),
      round(spiky(seed + 6, 0.05, 30.0), 0).as("sub1"),
      round(spiky(seed + 7, 0.08, 15.0), 0).as("sub2"),
      round(envelope * 6.0 + rand(seed + 8) * 2.0, 0).as("sub3"),
      rand(seed + 10).as("c1"), rand(seed + 11).as("c2"), rand(seed + 12).as("c3"),
      rand(seed + 13).as("c4"), rand(seed + 14).as("c5"), rand(seed + 15).as("c6"),
      rand(seed + 16).as("c7")
    )
    def nz(c: Column, coin: String): Column = when(col(coin) < p, lit(null)).otherwise(c)
    base.select(
      col("ts"),
      nz(col("gap0"), "c1").as("global_active_power"),
      nz(col("grp0"), "c2").as("global_reactive_power"),
      nz(col("volt0"), "c3").as("voltage"),
      nz(round(col("gap0") * 1000.0 / col("volt0") + col("gi_noise"), 1), "c4").as("global_intensity"),
      nz(col("sub1"), "c5").as("sub_metering_1"),
      nz(col("sub2"), "c6").as("sub_metering_2"),
      nz(col("sub3"), "c7").as("sub_metering_3"),
      (col("id") % 24).cast(IntegerType).as("hour"),
      format_string("day%01d", (col("id") % 7).cast(IntegerType) + 1).as("weekday")
    )
  }

  /** Temperature IoT: few columns, many rows, slow drift. */
  def temp(spark: SparkSession, sf: Double, seed: Long): DataFrame = {
    val base = spark.range(rows(10553597L, sf)).withColumn("ts", col("id"))
    base.select(
      col("ts"),
      zipfCat(seed + 1, 10, 0.9, "sensor").as("device"),
      round(lit(21.0) + diurnal(col("ts"), 86400.0, 5.0) + rand(seed + 2) * 0.8, 2).as("temperature"),
      round(lit(50.0) + diurnal(col("ts"), 86400.0, -8.0) + rand(seed + 3) * 3.0, 1).as("humidity"),
      round(lit(100.0) - col("id") / 2e7 + rand(seed + 4) * 0.05, 2).as("battery")
    )
  }

  /** Flights (2015 US flight delays, [58]) — 32 columns: categorical codes,
    * correlated schedule/delay/distance numerics, cancellations as nulls.
    */
  def flights(spark: SparkSession, sf: Double, seed: Long): DataFrame = {
    // Stage 1 materialises every random primitive once: seeded rand() in
    // Spark is a per-expression-instance stream, so re-using a Column
    // object inside a conditional branch would desynchronise the stream and
    // silently destroy cross-column correlations.
    val base = spark.range(rows(5819079L, sf)).toDF("id").select(
      col("id"),
      round(expTail(seed + 1, 600.0) + 100.0, 0).as("distance"),
      round(rand(seed + 2) * 20.0 + 15.0, 0).as("air_noise"),
      round(expTail(seed + 3, 10.0) + 5.0, 0).as("taxi_out0"),
      round(expTail(seed + 4, 5.0) + 3.0, 0).as("taxi_in0"),
      round(expTail(seed + 5, 25.0) - 8.0, 0).as("dep_delay0"),
      round(rand(seed + 6) * 20.0 - 10.0, 0).as("arr_noise"),
      (rand(seed + 7) * 1380.0 + 30.0).cast(IntegerType).as("sched_dep"),
      when(rand(seed + 8) < 0.015, 1).otherwise(0).as("cancelled0"),
      when(rand(seed + 9) < 0.002, 1).otherwise(0).as("diverted0"),
      round(rand(seed + 15) * 10.0, 0).as("sched_noise"),
      zipfCat(seed + 10, 14, 0.8, "AL").as("airline0"),
      (zipfIdx(seed + 11, 6000, 0.7) + 1).as("flight_number0"),
      zipfCat(seed + 12, 400, 0.9, "TN").as("tail_number0"),
      zipfCat(seed + 13, 300, 1.1, "ORG").as("origin0"),
      zipfCat(seed + 14, 300, 1.1, "DST").as("dest0"),
      zipfCat(seed + 16, 4, 0.5, "CR").as("creason0"),
      round(rand(seed + 17) * 3.0, 0).as("dn1"),
      round(rand(seed + 18) * 3.0, 0).as("dn2"),
      round(rand(seed + 19) * 3.0, 0).as("dn3"),
      round(rand(seed + 20) * 3.0, 0).as("dn4"),
      round(rand(seed + 21) * 3.0, 0).as("dn5")
    )
    val dayOfYear = (col("id") % 365).cast(IntegerType) + 1
    val month = (dayOfYear / 31).cast(IntegerType) + 1
    val distance = col("distance")
    val airTime = round(distance / 8.0, 0) + col("air_noise")
    val taxiOut = col("taxi_out0")
    val taxiIn = col("taxi_in0")
    val depDelay = col("dep_delay0")
    val arrDelay = depDelay + col("arr_noise")
    val schedDep = col("sched_dep")
    val elapsed = airTime + taxiOut + taxiIn
    val cancelled = col("cancelled0")
    val diverted = col("diverted0")
    val flown = cancelled === 0
    def ifFlown(c: Column): Column = when(flown, c).otherwise(lit(null))
    val delayBig = arrDelay > 15
    def delayPart(noise: Column, share: Double): Column =
      when(flown && delayBig, round(greatest(arrDelay, lit(0.0)) * share, 0) + noise).otherwise(lit(null))
    base.select(
      lit(2015).as("year"),
      month.as("month"),
      ((dayOfYear - 1) % 31 + 1).as("day"),
      ((col("id") % 7) + 1).cast(IntegerType).as("day_of_week"),
      dayOfYear.as("day_of_year"),
      col("airline0").as("airline"),
      col("flight_number0").as("flight_number"),
      col("tail_number0").as("tail_number"),
      col("origin0").as("origin_airport"),
      col("dest0").as("destination_airport"),
      schedDep.as("scheduled_departure"),
      ifFlown(schedDep + depDelay).as("departure_time"),
      ifFlown(depDelay).as("departure_delay"),
      ifFlown(taxiOut).as("taxi_out"),
      ifFlown(schedDep + depDelay + taxiOut).as("wheels_off"),
      round(elapsed + col("sched_noise"), 0).as("scheduled_time"),
      ifFlown(elapsed).as("elapsed_time"),
      ifFlown(airTime).as("air_time"),
      distance.as("distance"),
      ifFlown(schedDep + depDelay + taxiOut + airTime).as("wheels_on"),
      ifFlown(taxiIn).as("taxi_in"),
      (schedDep + elapsed).cast(IntegerType).as("scheduled_arrival"),
      ifFlown(schedDep + arrDelay + elapsed).as("arrival_time"),
      ifFlown(arrDelay).as("arrival_delay"),
      diverted.as("diverted"),
      cancelled.as("cancelled"),
      when(cancelled === 1, col("creason0")).otherwise(lit(null)).as("cancellation_reason"),
      delayPart(col("dn1"), 0.3).as("air_system_delay"),
      delayPart(col("dn2"), 0.05).as("security_delay"),
      delayPart(col("dn3"), 0.35).as("airline_delay"),
      delayPart(col("dn4"), 0.25).as("late_aircraft_delay"),
      delayPart(col("dn5"), 0.05).as("weather_delay")
    )
  }

  /** Chicago taxi trips: zipf zones, correlated fare/distance/duration. */
  def taxis(spark: SparkSession, sf: Double, seed: Long): DataFrame = {
    // Two-stage select: random primitives materialised once (see flights).
    val base = spark.range(rows(3889032L, sf)).toDF("id").select(
      col("id"),
      round(expTail(seed + 1, 3.5) + 0.3, 2).as("miles0"),
      round(expTail(seed + 2, 240.0), 0).as("sec_noise"),
      round(rand(seed + 3), 2).as("fare_noise"),
      rand(seed + 4).as("tip_coin"),
      round(rand(seed + 5) * 0.25, 3).as("tip_rate"),
      rand(seed + 6).as("toll_coin"),
      round(expTail(seed + 7, 4.0), 2).as("toll_amt"),
      rand(seed + 8).as("extra_coin"),
      round(rand(seed + 9) * 5.0, 2).as("extra_amt"),
      (rand(seed + 10) * 3.1536e7).cast(LongType).as("start_ts"),
      zipfCat(seed + 11, 500, 1.0, "taxi").as("taxi_id0"),
      zipfCat(seed + 12, 77, 1.2, "PU").as("pu0"),
      zipfCat(seed + 13, 77, 1.2, "DO").as("do0"),
      zipfCat(seed + 14, 5, 0.6, "PAY").as("pay0"),
      zipfCat(seed + 15, 30, 1.0, "co0").as("co0"),
      round(rand(seed + 16) * 0.2 - 0.1, 4).as("plat_n"),
      round(rand(seed + 17) * 0.2 - 0.1, 4).as("plon_n"),
      round(rand(seed + 18) * 0.2 - 0.1, 4).as("dlat_n"),
      round(rand(seed + 19) * 0.2 - 0.1, 4).as("dlon_n"),
      when(rand(seed + 20) < 0.1, 1).otherwise(0).as("shared0")
    )
    val miles = col("miles0")
    val seconds = round(miles * 180.0, 0) + col("sec_noise")
    val fare = round(lit(3.25) + miles * 2.25 + seconds * 0.004 + col("fare_noise"), 2)
    val tips = round(when(col("tip_coin") < 0.55, fare * col("tip_rate")).otherwise(0.0), 2)
    val tolls = when(col("toll_coin") < 0.03, col("toll_amt")).otherwise(0.0)
    val extras = when(col("extra_coin") < 0.3, col("extra_amt")).otherwise(0.0)
    val startTs = col("start_ts")
    base.select(
      col("taxi_id0").as("taxi_id"),
      startTs.as("trip_start_ts"),
      (startTs + seconds.cast(LongType)).as("trip_end_ts"),
      seconds.as("trip_seconds"),
      miles.as("trip_miles"),
      round(miles / greatest(seconds, lit(1.0)) * 3600.0, 1).as("trip_mph"),
      col("pu0").as("pickup_area"),
      col("do0").as("dropoff_area"),
      fare.as("fare"),
      tips.as("tips"),
      tolls.as("tolls"),
      extras.as("extras"),
      round(fare + tips + tolls + extras, 2).as("trip_total"),
      col("pay0").as("payment_type"),
      col("co0").as("company"),
      round(lit(41.88) + col("plat_n"), 4).as("pickup_lat"),
      round(lit(-87.63) + col("plon_n"), 4).as("pickup_lon"),
      round(lit(41.88) + col("dlat_n"), 4).as("dropoff_lat"),
      round(lit(-87.63) + col("dlon_n"), 4).as("dropoff_lon"),
      ((startTs / 2628000L) % 12 + 1).cast(IntegerType).as("month"),
      ((startTs / 86400L) % 31 + 1).cast(IntegerType).as("day"),
      ((startTs / 3600L) % 24).cast(IntegerType).as("hour"),
      col("shared0").as("shared")
    )
  }
}
