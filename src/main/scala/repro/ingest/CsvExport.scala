package repro.ingest

import java.nio.file.{Files, Path, Paths}
import java.nio.charset.StandardCharsets

import org.apache.spark.sql.functions._

import repro.data.SmartCityDataset

/** Writes a dataset in the paper's upload format (Section 3.2) — single
  * local `data.csv`, `location.csv`, `attribute.csv` files with nulls
  * spelled as the literal "null", exactly as the paper's example shows.
  * Used for ingest round-trip tests and to hand real files to the chunked
  * uploader.
  */
object CsvExport {

  /** Writes the three files into `dir` and returns their paths
    * (data, location, attribute).
    */
  def write(ds: SmartCityDataset, dir: String): (String, String, String) = {
    val base = Paths.get(dir)
    Files.createDirectories(base)

    val dataRows = ds.data
      .select(
        col("id"), col("attribute"),
        date_format(col("time"), "yyyy-MM-dd HH:mm:ss").as("time"),
        coalesce(col("data").cast("string"), lit("null")).as("data"),
      )
      .orderBy("id", "time")
      .collect()
      .map(r => s"${r.getString(0)},${r.getString(1)},${r.getString(2)},${r.getString(3)}")
      .toIndexedSeq

    val dataPath = writeLines(base.resolve("data.csv"), "id,attribute,time,data" +: dataRows)

    val locRows = ds.locations
      .orderBy("id")
      .collect()
      .map(r => s"${r.get(0)},${r.get(1)},${r.get(2)},${r.get(3)}")
      .toIndexedSeq
    val locPath = writeLines(base.resolve("location.csv"), "id,attribute,lat,lon" +: locRows)

    val attrPath = writeLines(base.resolve("attribute.csv"), ds.attributes)

    (dataPath.toString, locPath.toString, attrPath.toString)
  }

  private def writeLines(path: Path, lines: Seq[String]): Path = {
    Files.write(path, lines.mkString("\n").getBytes(StandardCharsets.UTF_8))
    path
  }
}
