package repro.exp

import repro.SparkSpec
import repro.core.Cap
import repro.data.SmartCityData

class ExpSpec extends SparkSpec {

  test("Tables.render aligns columns and keeps all rows") {
    val out = Tables.render("t", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = out.split("\n")
    assert(lines.length == 5)
    assert(lines(0) == "== t ==")
    assert(lines.drop(1).map(_.length).distinct.size == 1, "all table lines same width")
    assert(lines(4).contains("333"))
  }

  test("Tables.timed measures and returns the result") {
    val (x, ms) = Tables.timed { Thread.sleep(30); 99 }
    assert(x == 99 && ms >= 25)
  }

  test("T1Stats paper rows match the paper's Section 4 numbers") {
    val byName = T1Stats.paper.map(p => p.dataset -> p).toMap
    assert(byName("santander").records == 2329936L && byName("santander").sensors == 552)
    assert(byName("china6").records == 6889740L && byName("china6").sensors == 9438)
    assert(byName("china13").records == 3511300L && byName("china13").sensors == 4810)
    assert(byName("covid19").records == 52261L && byName("covid19").sensors == 12)
  }

  test("T1Stats.measure counts a small dataset consistently with its generator") {
    val m = T1Stats.measure(spark, "covid19", 1.0)
    assert(m.sensors == 12 && m.records == 52261L && m.nAttributes == 6)
    assert(m.nullRecords > 0 && m.nullRecords < m.records / 10)
  }

  test("T5Cases.patterns groups CAPs by attribute set") {
    val caps = Seq(
      Cap(Seq("a", "b"), Seq("s1", "s2"), 10),
      Cap(Seq("a", "b"), Seq("s1", "s3"), 20),
      Cap(Seq("b", "c"), Seq("s4", "s5"), 5),
    )
    val rows = T5Cases.patterns(caps)
    assert(rows.head == T5Cases.PatternRow("a+b", 2, 20))
    assert(rows(1) == T5Cases.PatternRow("b+c", 1, 5))
  }

  test("T5Cases.classifyChina separates within-city, same-row, and cross-row CAPs") {
    val ds = SmartCityData.china6(spark, 0.004)
    val locs = ds.locations.collect().map(r => (r.getString(0), r.getDouble(2)))
    def rowOf(lat: Double) = math.round((lat - 20.0) / 3.5)
    val row0 = locs.filter(l => rowOf(l._2) == 0).map(_._1).sorted
    val row1 = locs.filter(l => rowOf(l._2) == 1).map(_._1).sorted
    // city ids: sensors 0-9 city0(row0), 10-19 city1(row1), 20-29 city2(row0)
    val within = Cap(Seq("NO2", "PM2.5"), row0.take(2).toSeq, 10)
    val sameRow = Cap(Seq("NO2", "PM2.5"), Seq(row0.head, row0.last), 10)
    val crossRow = Cap(Seq("NO2", "PM2.5"), Seq(row0.head, row1.head), 10)
    val rows = T5Cases.classifyChina(spark, ds, Seq(within, sameRow, crossRow))
    assert(rows.find(_.kind == "within-city").get.nCaps == 1)
    assert(rows.find(_.kind.contains("same row")).get.nCaps == 1)
    assert(rows.find(_.kind.contains("cross row")).get.nCaps == 1)
  }
}
