package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Direct tests of the per-component CAP search on hand-built graphs. */
class CapSearchSpec extends AnyFunSuite {

  private val NT = 64

  /** Sensor with plus-events at `plus` and minus-events at `minus`. */
  private def sensor(id: String, attr: String, plus: Seq[Int], minus: Seq[Int] = Nil): SensorEvents = {
    val p = Bits.empty(NT); plus.foreach(Bits.set(p, _))
    val m = Bits.empty(NT); minus.foreach(Bits.set(m, _))
    SensorEvents(id, attr, p, m)
  }

  private def adjacency(n: Int, edges: (Int, Int)*): Array[Array[Int]] = {
    val b = Array.fill(n)(Set.newBuilder[Int])
    edges.foreach { case (x, y) => b(x) += y; b(y) += x }
    b.map(_.result().toArray.sorted)
  }

  private def caps(sensors: Seq[SensorEvents], adj: Array[Array[Int]], params: CapParams): Set[Cap] =
    CapSearch.enumerate(sensors.toArray, adj, params).toSet

  private val base = CapParams(psi = 2, mu = 3, maxSensors = 4)

  test("a co-evolving adjacent pair with two attributes is a CAP") {
    val s = Seq(sensor("a", "temp", Seq(1, 5, 9)), sensor("b", "traffic", Seq(1, 5, 20)))
    val got = caps(s, adjacency(2, (0, 1)), base)
    assert(got == Set(Cap(Seq("temp", "traffic"), Seq("a", "b"), 2)))
  }

  test("no edge, no CAP — co-evolution alone is not enough") {
    val s = Seq(sensor("a", "temp", Seq(1, 5)), sensor("b", "traffic", Seq(1, 5)))
    assert(caps(s, adjacency(2), base).isEmpty)
  }

  test("support below psi is rejected") {
    val s = Seq(sensor("a", "temp", Seq(1)), sensor("b", "traffic", Seq(1)))
    assert(caps(s, adjacency(2, (0, 1)), base).isEmpty)
  }

  test("same-attribute pairs are excluded unless allowSingleAttribute") {
    val s = Seq(sensor("a", "temp", Seq(1, 5)), sensor("b", "temp", Seq(1, 5)))
    val adj = adjacency(2, (0, 1))
    assert(caps(s, adj, base).isEmpty)
    val got = caps(s, adj, base.copy(allowSingleAttribute = true))
    assert(got == Set(Cap(Seq("temp"), Seq("a", "b"), 2)))
  }

  test("SameSign policy: support counts all-up plus all-down timestamps") {
    val s = Seq(
      sensor("a", "temp", plus = Seq(1, 2), minus = Seq(3, 4)),
      sensor("b", "traffic", plus = Seq(1, 9), minus = Seq(3)),
    )
    val got = caps(s, adjacency(2, (0, 1)), base.copy(psi = 1))
    // Co-evolving: t1 (both plus) and t3 (both minus) → support 2.
    assert(got == Set(Cap(Seq("temp", "traffic"), Seq("a", "b"), 2)))
  }

  test("AnySign policy admits opposite directions") {
    val s = Seq(
      sensor("a", "temp", plus = Seq(1, 2)),
      sensor("b", "humidity", plus = Nil, minus = Seq(1, 2)),
    )
    assert(caps(s, adjacency(2, (0, 1)), base).isEmpty) // SameSign: no common direction
    val got = caps(s, adjacency(2, (0, 1)), base.copy(signPolicy = SignPolicy.AnySign))
    assert(got == Set(Cap(Seq("humidity", "temp"), Seq("a", "b"), 2)))
  }

  test("mu bounds the number of distinct attributes") {
    val s = Seq(
      sensor("a", "t1", Seq(1, 2, 3)),
      sensor("b", "t2", Seq(1, 2, 3)),
      sensor("c", "t3", Seq(1, 2, 3)),
    )
    val adj = adjacency(3, (0, 1), (1, 2))
    val mu2 = caps(s, adj, base.copy(mu = 2))
    assert(mu2 == Set(
      Cap(Seq("t1", "t2"), Seq("a", "b"), 3),
      Cap(Seq("t2", "t3"), Seq("b", "c"), 3),
    ))
    val mu3 = caps(s, adj, base.copy(mu = 3))
    assert(mu3.contains(Cap(Seq("t1", "t2", "t3"), Seq("a", "b", "c"), 3)))
    assert(mu3.size == 3)
  }

  test("patterns must be connected through their own members") {
    // a—b—c path where only a and c co-evolve: {a,c} is disconnected
    // without b, so no CAP containing exactly {a,c} may appear.
    val s = Seq(
      sensor("a", "t1", Seq(1, 2)),
      sensor("b", "t2", Seq(40, 50)),
      sensor("c", "t3", Seq(1, 2)),
    )
    val got = caps(s, adjacency(3, (0, 1), (1, 2)), base)
    assert(got.isEmpty)
  }

  test("maxSensors caps pattern size") {
    val s = (0 until 5).map(i => sensor(s"s$i", s"a$i", Seq(1, 2)))
    val adj = adjacency(5, (0, 1), (1, 2), (2, 3), (3, 4))
    val got = caps(s, adj, base.copy(mu = 5, maxSensors = 2))
    assert(got.forall(_.sensors.size == 2))
    assert(got.size == 4) // the four path edges
  }

  test("one sensor can appear with repeated attributes in a pattern") {
    val s = Seq(
      sensor("a", "traffic", Seq(1, 2)),
      sensor("b", "traffic", Seq(1, 2)),
      sensor("c", "temp", Seq(1, 2)),
    )
    val got = caps(s, adjacency(3, (0, 1), (1, 2), (0, 2)), base)
    assert(got.contains(Cap(Seq("temp", "traffic"), Seq("a", "b", "c"), 2)))
  }

  test("empty and single-sensor components yield nothing") {
    assert(caps(Nil, adjacency(0), base).isEmpty)
    assert(caps(Seq(sensor("a", "t", Seq(1, 2, 3))), adjacency(1), base).isEmpty)
  }

  test("each qualifying set is emitted exactly once") {
    val s = Seq(
      sensor("a", "t1", Seq(1, 2, 3)),
      sensor("b", "t2", Seq(1, 2, 3)),
      sensor("c", "t3", Seq(1, 2, 3)),
      sensor("d", "t4", Seq(1, 2, 3)),
    )
    // Complete graph on 4 vertices: many overlapping enumeration paths.
    val adj = adjacency(4, (0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3))
    val list = CapSearch.enumerate(s.toArray, adj, base.copy(mu = 4, maxSensors = 4))
    val keys = list.map(c => c.sensors.mkString(","))
    assert(keys.distinct.size == keys.size, s"duplicates in $keys")
    // All subsets of size 2..4 are connected in K4: C(4,2)+C(4,3)+C(4,4)=11.
    assert(list.size == 11)
  }

  test("setSupport matches incremental support") {
    val a = sensor("a", "t1", plus = Seq(1, 2, 5), minus = Seq(7))
    val b = sensor("b", "t2", plus = Seq(2, 5), minus = Seq(7, 9))
    assert(CapSearch.setSupport(Seq(a, b), SignPolicy.SameSign) == 3)
    assert(CapSearch.setSupport(Seq(a, b), SignPolicy.AnySign) == 3)
    val c = sensor("c", "t3", plus = Seq(5), minus = Seq(2))
    assert(CapSearch.setSupport(Seq(a, b, c), SignPolicy.SameSign) == 1)
    assert(CapSearch.setSupport(Seq(a, b, c), SignPolicy.AnySign) == 2)
  }
}
