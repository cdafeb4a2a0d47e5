package repro.bench

import repro.SparkSpec
import repro.exp.T1Stats

/** T1 — dataset statistics (paper Section 4).
  *
  * At sf = 1 the synthetic generators must reproduce the paper's numbers
  * *exactly*: sensor count, record count, attribute count. This is the one
  * table where exact equality (not shape) is the bar, because the counts
  * are generator invariants, not measurements.
  */
class T1DatasetStatsBench extends SparkSpec {

  private lazy val measured = T1Stats.paper.map(p => p.dataset -> T1Stats.measure(spark, p.dataset, 1.0)).toMap

  for (p <- T1Stats.paper) {
    test(s"T1: ${p.dataset} matches the paper exactly (${p.sensors} sensors, ${p.records} records, ${p.nAttributes} attributes)") {
      val m = measured(p.dataset)
      assert(m.sensors == p.sensors, s"sensors: paper=${p.sensors} ours=${m.sensors}")
      assert(m.records == p.records, s"records: paper=${p.records} ours=${m.records}")
      assert(m.nAttributes == p.nAttributes, s"attributes: paper=${p.nAttributes} ours=${m.nAttributes}")
    }
  }

  test("T1: print the full table") {
    val rows = T1Stats.paper.map { p =>
      val m = measured(p.dataset)
      Seq(p.dataset, p.sensors.toString, m.sensors.toString, p.records.toString,
        m.records.toString, p.nAttributes.toString, m.nAttributes.toString, m.nullRecords.toString)
    }
    println(repro.exp.Tables.render(
      "T1 dataset statistics (sf=1)",
      Seq("dataset", "sensors(paper)", "sensors(ours)", "records(paper)", "records(ours)",
        "attrs(paper)", "attrs(ours)", "null records(ours)"),
      rows,
    ))
  }
}
