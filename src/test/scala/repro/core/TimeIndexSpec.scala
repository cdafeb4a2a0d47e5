package repro.core

import repro.SparkSpec

class TimeIndexSpec extends SparkSpec {
  import TinyWorld._

  test("build assigns dense ascending indices in time order") {
    val data = dataDf(spark, Map(("a", "t") -> Seq(Some(1.0), Some(2.0), Some(3.0))))
    val idx = TimeIndex.build(data).collect()
      .map(r => (r.getTimestamp(0), r.getInt(1))).sortBy(_._2)
    assert(idx.map(_._2).toSeq == Seq(0, 1, 2))
    assert(idx.map(_._1).toSeq == idx.map(_._1).sortBy(_.getTime).toSeq)
  }

  test("attach keys every record to the shared grid across sensors") {
    val data = dataDf(spark, Map(
      ("a", "t") -> Seq(Some(1.0), Some(2.0)),
      ("b", "u") -> Seq(Some(3.0), Some(4.0)),
    ))
    val got = TimeIndex.attach(data).collect()
      .map(r => (r.getAs[String]("id"), r.getAs[Int]("tIdx"))).toSet
    assert(got == Set(("a", 0), ("a", 1), ("b", 0), ("b", 1)))
  }

  test("sensors with ragged lengths still share indices for common timestamps") {
    val data = dataDf(spark, Map(
      ("a", "t") -> Seq(Some(1.0), Some(2.0), Some(3.0)),
      ("b", "u") -> Seq(Some(5.0)),
    ))
    val byId = TimeIndex.attach(data).collect()
      .groupBy(_.getAs[String]("id")).view.mapValues(_.map(_.getAs[Int]("tIdx")).sorted.toSeq).toMap
    assert(byId("a") == Seq(0, 1, 2))
    assert(byId("b") == Seq(0))
  }

  test("duplicate (sensor, time) rows do not create duplicate grid slots") {
    val base = dataDf(spark, Map(("a", "t") -> Seq(Some(1.0), Some(2.0))))
    val data = base.union(base)
    assert(TimeIndex.build(data).count() == 2)
  }
}
