package repro.ingest

import java.nio.charset.StandardCharsets
import java.nio.file.{Files, Paths}

import repro.SparkSpec
import repro.data.SmartCityData

class CsvIngestSpec extends SparkSpec {

  private def tmpDir(): String = Files.createTempDirectory("ingest-spec").toString

  private def writeFiles(dir: String, data: Seq[String], loc: Seq[String], attrs: Seq[String]): (String, String, String) = {
    def w(name: String, lines: Seq[String]): String = {
      val p = Paths.get(dir, name)
      Files.write(p, lines.mkString("\n").getBytes(StandardCharsets.UTF_8))
      p.toString
    }
    (w("data.csv", data), w("location.csv", loc), w("attribute.csv", attrs))
  }

  private val header = "id,attribute,time,data"
  private val locHeader = "id,attribute,lat,lon"

  test("reads the paper's example format, including the null literal") {
    val dir = tmpDir()
    val (d, l, a) = writeFiles(dir,
      Seq(header,
        "00000,temperature,2016-03-01 00:00:00,null",
        "00000,temperature,2016-03-01 01:00:00,9.87"),
      Seq(locHeader, "00000,temperature,43.46192,-3.80176"),
      Seq("temperature", "light"))
    val ds = CsvIngest.read(spark, "santander", d, l, a)
    assert(ds.name == "santander")
    assert(ds.attributes == Seq("temperature", "light"))
    val rows = ds.data.orderBy("time").collect()
    assert(rows.length == 2)
    assert(rows(0).isNullAt(3))
    assert(rows(1).getDouble(3) == 9.87)
    val loc = ds.locations.collect()(0)
    assert(loc.getDouble(2) == 43.46192 && loc.getDouble(3) == -3.80176)
  }

  test("rejects data attributes missing from attribute.csv") {
    val dir = tmpDir()
    val (d, l, a) = writeFiles(dir,
      Seq(header, "00000,sound,2016-03-01 00:00:00,1.0"),
      Seq(locHeader, "00000,sound,43.0,-3.8"),
      Seq("temperature"))
    val err = intercept[CsvIngest.ValidationError] { CsvIngest.read(spark, "x", d, l, a) }
    assert(err.getMessage.contains("attribute"))
  }

  test("rejects sensors missing from location.csv") {
    val dir = tmpDir()
    val (d, l, a) = writeFiles(dir,
      Seq(header, "00001,temperature,2016-03-01 00:00:00,1.0"),
      Seq(locHeader, "00000,temperature,43.0,-3.8"),
      Seq("temperature"))
    val err = intercept[CsvIngest.ValidationError] { CsvIngest.read(spark, "x", d, l, a) }
    assert(err.getMessage.contains("sensor"))
  }

  test("rejects a ragged (non-equal-interval) timestamp grid") {
    val dir = tmpDir()
    val (d, l, a) = writeFiles(dir,
      Seq(header,
        "00000,temperature,2016-03-01 00:00:00,1.0",
        "00000,temperature,2016-03-01 01:00:00,2.0",
        "00000,temperature,2016-03-01 03:30:00,3.0"),
      Seq(locHeader, "00000,temperature,43.0,-3.8"),
      Seq("temperature"))
    val err = intercept[CsvIngest.ValidationError] { CsvIngest.read(spark, "x", d, l, a) }
    assert(err.getMessage.contains("grid"))
  }

  test("rejects unparseable timestamps") {
    val dir = tmpDir()
    val (d, l, a) = writeFiles(dir,
      Seq(header, "00000,temperature,not-a-time,1.0"),
      Seq(locHeader, "00000,temperature,43.0,-3.8"),
      Seq("temperature"))
    val err = intercept[CsvIngest.ValidationError] { CsvIngest.read(spark, "x", d, l, a) }
    assert(err.getMessage.contains("timestamp"))
  }

  test("validate = false skips the checks") {
    val dir = tmpDir()
    val (d, l, a) = writeFiles(dir,
      Seq(header, "00001,mystery,2016-03-01 00:00:00,1.0"),
      Seq(locHeader, "00000,temperature,43.0,-3.8"),
      Seq("temperature"))
    val ds = CsvIngest.read(spark, "x", d, l, a, validate = false)
    assert(ds.data.count() == 1)
  }

  test("round-trip: export a generated dataset and ingest it back unchanged") {
    val ds = SmartCityData.covid19(spark)
    import org.apache.spark.sql.functions._
    val slice = ds.data.where(col("time") < lit("2020-01-05")) // keep the file small
    val small = ds.copy(data = slice)
    val dir = tmpDir()
    val (d, l, a) = CsvExport.write(small, dir)
    val back = CsvIngest.read(spark, "covid19", d, l, a)

    assert(back.attributes == ds.attributes)
    assert(back.locations.count() == ds.locations.count())
    assert(back.data.count() == slice.count())
    // Values survive the text round trip (nulls included).
    val orig = slice.orderBy("id", "time").collect()
      .map(r => (r.getString(0), r.getTimestamp(2), Option(r.get(3)).map(_.toString)))
    val readBack = back.data.orderBy("id", "time").collect()
      .map(r => (r.getString(0), r.getTimestamp(2), Option(r.get(3)).map(_.toString)))
    assert(orig.toSeq == readBack.toSeq)
  }

  test("round-trip preserves null count") {
    val ds = SmartCityData.santander(spark, 0.01)
    import org.apache.spark.sql.functions._
    val slice = ds.data.where(col("time") < lit("2016-03-10"))
    val dir = tmpDir()
    val (d, l, a) = CsvExport.write(ds.copy(data = slice), dir)
    val back = CsvIngest.read(spark, "santander", d, l, a)
    assert(back.data.where(col("data").isNull).count() ==
      slice.where(col("data").isNull).count())
  }
}
