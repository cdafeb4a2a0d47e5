package repro.ingest

import org.apache.spark.sql.types._

/** Schemas of the paper's three upload files (Section 3.2). */
object CsvSchemas {

  /** `data.csv`: id, attribute, time, data — `data` is the literal string
    * "null" when the sensor had no value at that timestamp.
    */
  val data: StructType = StructType(Seq(
    StructField("id", StringType, nullable = false),
    StructField("attribute", StringType, nullable = false),
    StructField("time", TimestampType, nullable = false),
    StructField("data", DoubleType, nullable = true),
  ))

  /** `location.csv`: id, attribute, lat, lon. */
  val location: StructType = StructType(Seq(
    StructField("id", StringType, nullable = false),
    StructField("attribute", StringType, nullable = false),
    StructField("lat", DoubleType, nullable = false),
    StructField("lon", DoubleType, nullable = false),
  ))

  /** `attribute.csv`: one attribute name per line, no header. */
  val attribute: StructType = StructType(Seq(
    StructField("attribute", StringType, nullable = false),
  ))
}
