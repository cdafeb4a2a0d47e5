package repro.exp

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.data.SmartCityData

/** T1 — dataset statistics (Section 4's bullet list).
  *
  * The paper reports, per dataset: number of sensors, number of records,
  * and the attribute list. At sf = 1 our generators must match exactly.
  */
object T1Stats {

  /** Paper-reported numbers (Section 4). */
  final case class PaperRow(dataset: String, sensors: Long, records: Long, nAttributes: Int)

  val paper: Seq[PaperRow] = Seq(
    PaperRow("santander", 552, 2329936L, 5),
    PaperRow("china6", 9438, 6889740L, 5),
    PaperRow("china13", 4810, 3511300L, 12),
    PaperRow("covid19", 12, 52261L, 6),
  )

  final case class MeasuredRow(dataset: String, sensors: Long, records: Long, nAttributes: Int, nullRecords: Long)

  /** Counts one generated dataset. */
  def measure(spark: SparkSession, name: String, sf: Double = 1.0): MeasuredRow = {
    val ds = SmartCityData.byName(spark, name, sf)
    val agg = ds.data.agg(
      count(lit(1)).as("records"),
      countDistinct(col("id")).as("sensors"),
      countDistinct(col("attribute")).as("attrs"),
      sum(when(col("data").isNull, 1L).otherwise(0L)).as("nulls"),
    ).collect()(0)
    MeasuredRow(name, agg.getLong(1), agg.getLong(0), agg.getLong(2).toInt, agg.getLong(3))
  }

  /** Full T1 table: paper vs measured for all four datasets. */
  def table(spark: SparkSession, sf: Double = 1.0): String = {
    val rows = paper.map { p =>
      val m = measure(spark, p.dataset, sf)
      Seq(p.dataset, p.sensors.toString, m.sensors.toString, p.records.toString,
        m.records.toString, p.nAttributes.toString, m.nAttributes.toString, m.nullRecords.toString)
    }
    Tables.render(
      s"T1 dataset statistics (sf=$sf; paper numbers are at full scale)",
      Seq("dataset", "sensors(paper)", "sensors(ours)", "records(paper)", "records(ours)",
        "attrs(paper)", "attrs(ours)", "null records(ours)"),
      rows,
    )
  }
}
