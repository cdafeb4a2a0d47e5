package repro.ingest

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.data.SmartCityDataset

/** Reads the paper's upload format (Section 3.2): `data.csv`,
  * `location.csv`, `attribute.csv` under one directory, validating the
  * cross-file invariants the MISCELA-V back end relies on:
  *
  *  - every (id, attribute) of `data.csv` is registered in `location.csv`;
  *  - every attribute is listed in `attribute.csv`;
  *  - timestamps lie on one synchronized grid (equal intervals), as the
  *    paper requires ("timestamps must be the same time intervals").
  *
  * `data` values equal to the literal string "null" become SQL nulls.
  */
object CsvIngest {

  final case class ValidationError(message: String) extends RuntimeException(message)

  /** Reads one dataset directory (dataCsv/locationCsv/attributeCsv paths). */
  def read(
      spark: SparkSession,
      name: String,
      dataCsv: String,
      locationCsv: String,
      attributeCsv: String,
      validate: Boolean = true,
  ): SmartCityDataset = {
    import spark.implicits._
    val rawData = spark.read
      .option("header", "true")
      .csv(dataCsv)
      .select(
        col("id"),
        col("attribute"),
        // try_to_timestamp: unparseable timestamps become null (then fail
        // validation) instead of throwing mid-scan under ANSI mode.
        expr("try_to_timestamp(time)").as("time"),
        when(lower(col("data")) === "null" || col("data").isNull, lit(null))
          .otherwise(col("data")).cast("double").as("data"),
      )
    val locations = spark.read
      .option("header", "true")
      .csv(locationCsv)
      .select(col("id"), col("attribute"), col("lat").cast("double"), col("lon").cast("double"))
    val attributes = spark.read
      .schema(CsvSchemas.attribute)
      .csv(attributeCsv)
      .collect()
      .map(_.getString(0))
      .toSeq

    if (validate) {
      val unknownAttr = rawData
        .select("attribute").distinct()
        .join(attributes.toDF("attribute"), Seq("attribute"), "left_anti")
        .count()
      if (unknownAttr > 0)
        throw ValidationError(s"$unknownAttr attribute(s) in data.csv missing from attribute.csv")

      val unknownSensor = rawData
        .select("id", "attribute").distinct()
        .join(locations.select("id", "attribute"), Seq("id", "attribute"), "left_anti")
        .count()
      if (unknownSensor > 0)
        throw ValidationError(s"$unknownSensor sensor(s) in data.csv missing from location.csv")

      val badTime = rawData.where(col("time").isNull).count()
      if (badTime > 0)
        throw ValidationError(s"$badTime record(s) with unparseable timestamps")

      // One synchronized grid: distinct inter-timestamp gaps must be equal.
      val gaps = rawData
        .select(col("time")).distinct()
        .select(unix_timestamp(col("time")).as("t"))
        .orderBy("t")
        .collect().map(_.getLong(0))
        .sliding(2).collect { case Array(a, b) => b - a }
        .toSet
      if (gaps.size > 1)
        throw ValidationError(s"timestamps are not on one equal-interval grid: gaps=$gaps")
    }

    SmartCityDataset(name, rawData, locations, attributes)
  }
}
