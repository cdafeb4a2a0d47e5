package repro.core

import scala.util.Random

import org.scalatest.funsuite.AnyFunSuite

/** The strongest correctness net for the search: the brute-force baseline
  * and the pruned search must return identical CAP sets on arbitrary
  * components, across parameters and sign policies.
  */
class NaiveVsCapSearchSpec extends AnyFunSuite {

  private def randomComponent(r: Random): (Array[SensorEvents], Array[Array[Int]]) = {
    val n = 2 + r.nextInt(6) // 2..7 sensors
    val nT = 32
    val nAttrs = 1 + r.nextInt(4)
    val sensors = (0 until n).map { i =>
      val p = Bits.empty(nT); val m = Bits.empty(nT)
      (0 until nT).foreach { t =>
        val x = r.nextDouble()
        if (x < 0.25) Bits.set(p, t) else if (x < 0.4) Bits.set(m, t)
      }
      SensorEvents(s"s$i", s"attr${r.nextInt(nAttrs)}", p, m)
    }.toArray
    val b = Array.fill(n)(Set.newBuilder[Int])
    for (i <- 0 until n; j <- (i + 1) until n if r.nextDouble() < 0.5) { b(i) += j; b(j) += i }
    (sensors, b.map(_.result().toArray.sorted))
  }

  private def canon(caps: Seq[Cap]): Seq[(String, String, Long)] =
    caps.map(c => (c.attributes.mkString(","), c.sensors.mkString(","), c.support)).sorted

  private def check(seed: Int, params: CapParams): Unit = {
    val r = new Random(seed)
    (1 to 10).foreach { round =>
      val (sensors, adj) = randomComponent(r)
      val fast = CapSearch.enumerate(sensors, adj, params)
      val slow = NaiveSearch.enumerate(sensors, adj, params)
      assert(canon(fast) == canon(slow),
        s"divergence at seed=$seed round=$round params=$params\n" +
          s"  fast=${canon(fast)}\n  slow=${canon(slow)}")
    }
  }

  private val paramGrid = Seq(
    CapParams(psi = 1, mu = 2, maxSensors = 4),
    CapParams(psi = 2, mu = 3, maxSensors = 5),
    CapParams(psi = 5, mu = 4, maxSensors = 7),
    CapParams(psi = 3, mu = 2, maxSensors = 3, allowSingleAttribute = true),
    CapParams(psi = 2, mu = 3, maxSensors = 5, signPolicy = SignPolicy.AnySign),
    CapParams(psi = 1, mu = 4, maxSensors = 7, signPolicy = SignPolicy.AnySign, allowSingleAttribute = true),
  )

  for ((params, pi) <- paramGrid.zipWithIndex; seed <- 1 to 5) {
    test(s"pruned search ≡ brute force (param set $pi, seed $seed)") {
      check(seed * 31 + pi, params)
    }
  }
}
