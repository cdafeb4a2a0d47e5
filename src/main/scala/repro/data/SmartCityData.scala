package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** One sensor of a synthetic deployment.
  *
  * A sensor loads on up to two latent factors; the loading may switch at
  * the dataset's regime-change timestamp (used by the COVID-19 dataset to
  * plant the before/after correlation-pattern change of Figure 4).
  *
  * @param nRecords how many leading timestamps of the global grid this
  *                 sensor reports (the trim that makes record counts match
  *                 the paper exactly)
  */
final case class SensorDef(
    id: String,
    attribute: String,
    lat: Double,
    lon: Double,
    f1: String,
    load1Before: Double,
    load1After: Double,
    f2: String,
    load2Before: Double,
    load2After: Double,
    base: Double,
    nRecords: Int,
)

/** A generated dataset in the paper's upload shape. */
final case class SmartCityDataset(
    name: String,
    data: DataFrame,      // id, attribute, time, data (nullable double)
    locations: DataFrame, // id, attribute, lat, lon
    attributes: Seq[String],
)

/** Synthetic versions of the paper's four demo datasets (Section 4).
  *
  * The real dumps are not distributable here, so we generate deterministic
  * stand-ins that (at sf = 1) match the paper's sensor counts, record
  * counts, and attribute lists exactly, and whose planted latent-factor
  * structure reproduces the paper's case-study findings — see DESIGN.md
  * "Substitutions". `sf` scales the sensor count (records scale along).
  */
object SmartCityData {

  val SantanderAttrs: Seq[String] = Seq("temperature", "light", "sound", "trafficVolume", "humidity")
  val China6Attrs: Seq[String] = Seq("PM2.5", "SO2", "NO2", "CO", "O3")
  val China13Attrs: Seq[String] = China6Attrs ++
    Seq("temperature", "humidity", "airPressure", "daylight", "rainfallPct", "rainVolume", "windSpeed")
  val CovidAttrs: Seq[String] = Seq("PM2.5", "PM10", "SO2", "NO2", "CO", "O3")

  private val BaseLevel: Map[String, Double] = Map(
    "temperature" -> 15.0, "light" -> 300.0, "sound" -> 50.0, "trafficVolume" -> 120.0,
    "humidity" -> 70.0, "PM2.5" -> 35.0, "PM10" -> 55.0, "SO2" -> 12.0, "NO2" -> 28.0,
    "CO" -> 0.9, "O3" -> 60.0, "airPressure" -> 1013.0, "daylight" -> 8.0,
    "rainfallPct" -> 30.0, "rainVolume" -> 2.0, "windSpeed" -> 4.0,
  )

  /** Event rate of every latent factor; support of a planted pair over nT
    * timestamps is ≈ pEvent · nT.
    */
  val PEvent = 0.05
  val Mag = 10.0
  val NoiseAmp = 0.4
  val PNull = 0.02

  // ---------------------------------------------------------------------
  // Generic machinery
  // ---------------------------------------------------------------------

  /** Splits `target` records over `n` sensors: first (target % n) sensors
    * get one extra — this is how the paper-exact totals are hit.
    */
  private[data] def recordCounts(target: Long, n: Int): IndexedSeq[Int] = {
    val base = (target / n).toInt
    val rem = (target % n).toInt
    (0 until n).map(i => base + (if (i < rem) 1 else 0))
  }

  private[data] def scaledSensors(full: Int, sf: Double, atLeast: Int): Int =
    math.max(atLeast, math.round(full * sf).toInt)

  private[data] def scaledRecords(fullRecords: Long, fullSensors: Int, n: Int): Long =
    math.round(fullRecords.toDouble * n / fullSensors)

  /** Jittered position around a centre, deterministic in (seed, i). */
  private def jitter(seed: String, i: Int, centre: (Double, Double), radiusDeg: Double): (Double, Double) = {
    def h(salt: String): Double =
      (math.abs(s"$seed#$i#$salt".hashCode).toDouble % 100000) / 100000.0
    (centre._1 + (h("lat") - 0.5) * 2 * radiusDeg, centre._2 + (h("lon") - 0.5) * 2 * radiusDeg)
  }

  /** Materialises a sensor roster into (data, locations) DataFrames. */
  private[data] def build(
      spark: SparkSession,
      name: String,
      sensors: Seq[SensorDef],
      nT: Int,
      start: String,
      intervalUnit: String, // HOUR or DAY
      regimeSwitchT: Int,
      attributes: Seq[String],
  ): SmartCityDataset = {
    import Factors._

    val roster = spark.createDataFrame(sensors)
    val grid = spark.range(nT).select(col("id").cast("int").as("tIdx"))
    val joined = roster.crossJoin(grid).where(col("tIdx") < col("nRecords"))

    def stepOf(f: Column, before: Column, after: Column): Column = {
      val load = when(col("tIdx") < regimeSwitchT, before).otherwise(after)
      load * jump(f, col("tIdx"), PEvent, Mag)
    }

    val w = Window.partitionBy("id").orderBy("tIdx")
    val valued = joined
      .withColumn("step",
        stepOf(col("f1"), col("load1Before"), col("load1After")) +
          stepOf(col("f2"), col("load2Before"), col("load2After")))
      .withColumn("level", col("base") + sum(col("step")).over(w) + noise(col("id"), col("tIdx"), NoiseAmp))
      .withColumn("data",
        when(hash01("null", col("id"), col("tIdx")) < PNull, lit(null).cast("double"))
          .otherwise(round(col("level"), 3)))
      .withColumn("time", expr(s"timestampadd($intervalUnit, tIdx, timestamp'$start')"))

    val data = valued.select("id", "attribute", "time", "data")
    val locations = roster.select("id", "attribute", "lat", "lon")
    SmartCityDataset(name, data, locations, attributes)
  }

  // ---------------------------------------------------------------------
  // Santander: 552 sensors, 2,329,936 records, 2016-03-01 →, hourly grid.
  // Planted: per cluster, {temperature, trafficVolume} share a factor and
  // {light, temperature} share another (the paper's reported findings);
  // sound sensors share a single-attribute factor (a negative case under
  // the ≥2-attribute rule); humidity is uncorrelated noise.
  // ---------------------------------------------------------------------
  def santander(spark: SparkSession, sf: Double = 1.0): SmartCityDataset = {
    val n = scaledSensors(552, sf, 5)
    val counts = recordCounts(scaledRecords(2329936L, 552, n), n)
    val clusterSize = 12
    val nClusters = math.max(1, math.ceil(n.toDouble / clusterSize).toInt)
    val gridCols = math.max(1, math.ceil(math.sqrt(nClusters.toDouble)).toInt)
    val sensors = (0 until n).map { i =>
      val c = i / clusterSize
      val (row, colIdx) = (c / gridCols, c % gridCols)
      val centre = (43.40 + row * (0.10 / math.max(1, gridCols - 1).toDouble),
        -3.90 + colIdx * (0.15 / math.max(1, gridCols - 1).toDouble))
      val (lat, lon) = jitter("santander", i, centre, 0.0012) // ~130 m jitter
      val attr = SantanderAttrs((i % clusterSize) % SantanderAttrs.size)
      val (f1, l1, f2, l2) = attr match {
        case "temperature"   => (s"st-tt-$c", 1.0, s"st-lt-$c", 1.0)
        case "trafficVolume" => (s"st-tt-$c", 1.5, "", 0.0)
        case "light"         => (s"st-lt-$c", 1.2, "", 0.0)
        case "sound"         => (s"st-snd-$c", 1.0, "", 0.0)
        case _               => ("", 0.0, "", 0.0) // humidity: noise only
      }
      SensorDef(f"$i%05d", attr, lat, lon, f1, l1, l1, f2, l2, l2, BaseLevel(attr), counts(i))
    }
    build(spark, "santander", sensors, counts.max, "2016-03-01 00:00:00", "HOUR", Int.MaxValue, SantanderAttrs)
  }

  // ---------------------------------------------------------------------
  // China6: 9,438 sensors, 6,889,740 records (730 daily points each),
  // 2016-09-01 →. Cities of ~10 sensors on a rows×cols grid; all pollutant
  // attributes in a city load the *corridor* factor of the city's
  // east-west row — so horizontally separated cities co-evolve while
  // vertically adjacent ones do not (the paper's wind-direction finding).
  // ---------------------------------------------------------------------
  def china6(spark: SparkSession, sf: Double = 1.0): SmartCityDataset = {
    val n = scaledSensors(9438, sf, 10)
    val counts = recordCounts(scaledRecords(6889740L, 9438, n), n)
    val sensors = chinaSensors(n, counts, citySize = 10, attrs = China6Attrs, met = false)
    build(spark, "china6", sensors, counts.max, "2016-09-01 00:00:00", "DAY", Int.MaxValue, China6Attrs)
  }

  // ---------------------------------------------------------------------
  // China13: 4,810 sensors, 3,511,300 records; China6 pollutants plus
  // meteorology. Planted: {temperature, daylight} share a per-city factor,
  // {humidity, rainfallPct, rainVolume} share another; airPressure and
  // windSpeed are noise.
  // ---------------------------------------------------------------------
  def china13(spark: SparkSession, sf: Double = 1.0): SmartCityDataset = {
    val n = scaledSensors(4810, sf, 12)
    val counts = recordCounts(scaledRecords(3511300L, 4810, n), n)
    val sensors = chinaSensors(n, counts, citySize = 12, attrs = China13Attrs, met = true)
    build(spark, "china13", sensors, counts.max, "2016-09-01 00:00:00", "DAY", Int.MaxValue, China13Attrs)
  }

  private def chinaSensors(
      n: Int,
      counts: IndexedSeq[Int],
      citySize: Int,
      attrs: Seq[String],
      met: Boolean,
  ): Seq[SensorDef] = {
    val nCities = math.max(1, math.ceil(n.toDouble / citySize).toInt)
    val nRows = if (nCities >= 64) 8 else 2
    (0 until n).map { i =>
      val city = i / citySize
      val row = city % nRows
      val colIdx = city / nRows
      // ~390 km between rows, ~48 km between columns: a country-scale η
      // connects both directions, but only rows share a factor.
      val centre = (20.0 + row * 3.5, 80.0 + colIdx * 0.5)
      val (lat, lon) = jitter("china", i, centre, 0.03) // ~3 km jitter
      val attr = attrs((i % citySize) % attrs.size)
      val corridor = s"cn-corridor-$row"
      val (f1, l1) = attr match {
        case "PM2.5" => (corridor, 1.2)
        case "SO2"   => (corridor, 0.9)
        case "NO2"   => (corridor, 1.0)
        case "CO"    => (corridor, 0.8)
        case "O3"    => (corridor, 1.1)
        case "temperature" if met => (s"cn-met-$city", 1.0)
        case "daylight" if met    => (s"cn-met-$city", 1.3)
        case "humidity" if met    => (s"cn-rain-$city", 1.0)
        case "rainfallPct" if met => (s"cn-rain-$city", 1.2)
        case "rainVolume" if met  => (s"cn-rain-$city", 0.9)
        case _ => ("", 0.0) // airPressure, windSpeed: noise only
      }
      SensorDef(f"$i%05d", attr, lat, lon, f1, l1, l1, "", 0.0, 0.0, BaseLevel(attr), counts(i))
    }
  }

  // ---------------------------------------------------------------------
  // COVID-19: 12 sensors (Shanghai + Guangzhou × 6 attributes),
  // 52,261 records, 2020-01-01 →, hourly; the factor loadings switch at
  // the midpoint: before, the per-city traffic factor couples
  // {NO2, CO, PM10, PM2.5}; after, traffic loadings vanish and an
  // atmospheric factor couples {PM2.5, O3} instead — so the discovered
  // correlation patterns change across the split, as in Figure 4.
  // ---------------------------------------------------------------------
  val CovidRegimeSwitchT = 2178

  def covid19(spark: SparkSession, sf: Double = 1.0): SmartCityDataset = {
    val _ = sf // 12 fixed sensors; the dataset is already tiny
    val n = 12
    val counts = recordCounts(52261L, n)
    val cities = Seq(("shanghai", 31.23, 121.47), ("guangzhou", 23.13, 113.26))
    val sensors = (0 until n).map { i =>
      val (cityName, cLat, cLon) = cities(i / CovidAttrs.size)
      val attr = CovidAttrs(i % CovidAttrs.size)
      val (lat, lon) = jitter("covid", i, (cLat, cLon), 0.03)
      val traffic = s"cv-traffic-$cityName"
      val atmo = s"cv-atmo-$cityName"
      val industry = s"cv-ind-$cityName"
      // (f1, before, after, f2, before, after)
      val (f1, b1, a1, f2, b2, a2) = attr match {
        case "NO2"   => (traffic, 1.5, 0.0, "", 0.0, 0.0)
        case "CO"    => (traffic, 1.2, 0.0, "", 0.0, 0.0)
        case "PM10"  => (traffic, 1.0, 0.0, "", 0.0, 0.0)
        case "PM2.5" => (traffic, 0.8, 0.0, atmo, 0.0, 1.0)
        case "O3"    => (atmo, 0.0, 1.5, "", 0.0, 0.0)
        case _       => (industry, 1.0, 1.0, "", 0.0, 0.0) // SO2: alone both periods
      }
      SensorDef(f"$i%05d", attr, lat, lon, f1, b1, a1, f2, b2, a2, BaseLevel(attr), counts(i))
    }
    build(spark, "covid19", sensors, counts.max, "2020-01-01 00:00:00", "HOUR", CovidRegimeSwitchT, CovidAttrs)
  }

  /** Dataset registry by name — used by the jobs and the cache bench. */
  def byName(spark: SparkSession, name: String, sf: Double): SmartCityDataset = name match {
    case "santander" => santander(spark, sf)
    case "china6"    => china6(spark, sf)
    case "china13"   => china13(spark, sf)
    case "covid19"   => covid19(spark, sf)
    case other       => throw new IllegalArgumentException(s"unknown dataset: $other")
  }
}
