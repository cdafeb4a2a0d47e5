package repro.geo

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** η-proximity self-join over sensor locations (MISCELA step 3 input).
  *
  * A naive cross join is O(n²) rows before filtering; we bucket sensors
  * into a grid of η-sized cells and only compare sensors in the same or
  * adjacent cells, then filter by exact haversine distance. The cell size
  * in degrees is chosen conservatively from the data's maximum |latitude|
  * so no pair within η km can span more than one cell boundary.
  *
  * Input: `locations` with columns (id, lat, lon). Output: undirected edge
  * list (src, dst, dist_km) with src < dst lexicographically and
  * dist_km < η. Sensors at identical coordinates but different ids (the
  * paper models one attribute per sensor, co-located sensors are distinct)
  * yield dist 0 edges.
  */
object SpatialJoin {

  private val KmPerDegLat = 111.32

  /** Proximity edges: all unordered pairs of distinct ids closer than `etaKm`. */
  def edges(spark: SparkSession, locations: DataFrame, etaKm: Double): DataFrame = {
    require(etaKm > 0, s"etaKm must be positive, got $etaKm")
    Haversine.register(spark)

    val locs = locations.select(col("id"), col("lat").cast("double"), col("lon").cast("double"))

    // Conservative degree extents of an η-km cell. Longitude degrees shrink
    // by cos(lat), so size lon cells by the worst (largest |lat|) row in the
    // data; guard against poles where the cos term degenerates.
    val maxAbsLatRow = locs.agg(max(abs(col("lat"))).as("m")).collect()(0)
    val maxAbsLat = if (maxAbsLatRow.isNullAt(0)) 0.0 else math.min(85.0, maxAbsLatRow.getDouble(0))
    val latCellDeg = etaKm / KmPerDegLat
    val lonCellDeg = etaKm / (KmPerDegLat * math.cos(math.toRadians(maxAbsLat)))

    val binned = locs
      .withColumn("cx", floor(col("lon") / lonCellDeg).cast("long"))
      .withColumn("cy", floor(col("lat") / latCellDeg).cast("long"))

    // Each sensor is replicated into its own cell plus the 8 neighbours of
    // the *left* side only (via the dedup condition below we still see every
    // pair once): replicate fully and dedup by id ordering instead — simpler
    // and the replication factor is a constant 9.
    val offsets = spark.createDataFrame(
      for { dx <- -1 to 1; dy <- -1 to 1 } yield (dx, dy)
    ).toDF("dx", "dy")

    val replicated = binned
      .crossJoin(offsets)
      .select(
        col("id"), col("lat"), col("lon"),
        (col("cx") + col("dx")).as("cx"),
        (col("cy") + col("dy")).as("cy"),
      )

    val a = binned.select(
      col("id").as("src"), col("lat").as("lat1"), col("lon").as("lon1"),
      col("cx"), col("cy"),
    )
    val b = replicated.select(
      col("id").as("dst"), col("lat").as("lat2"), col("lon").as("lon2"),
      col("cx"), col("cy"),
    )

    a.join(b, Seq("cx", "cy"))
      .where(col("src") < col("dst"))
      .withColumn("dist_km", expr("haversine_km(lat1, lon1, lat2, lon2)"))
      .where(col("dist_km") < etaKm)
      .select("src", "dst", "dist_km")
      .distinct() // the 9x replication can surface a pair from several cells
  }
}
