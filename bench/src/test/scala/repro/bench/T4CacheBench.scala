package repro.bench

import java.nio.file.Files

import repro.SparkSpec
import repro.cache.CapCache
import repro.core.CapParams
import repro.data.SmartCityData
import repro.exp.T4Cache

/** T4 — the caching mechanism (paper Section 3.3).
  *
  * Reproduced shape: a warm request (same dataset + parameters) is served
  * from the store at a small fraction of the cold request's latency, and
  * any parameter change misses again.
  */
class T4CacheBench extends SparkSpec {

  private lazy val ds = SmartCityData.santander(spark, 0.05)
  private val p = CapParams(epsilon = 1.0, etaKm = 0.5, mu = 3, psi = 50, maxSensors = 4)

  private lazy val rows = {
    val cache = new CapCache(Files.createTempDirectory("t4-cache").toString)
    T4Cache.play(spark, ds, cache, Seq(
      ("req1: cold", p),
      ("req2: identical params", p),
      ("req3: identical again", p),
      ("req4: psi changed", p.copy(psi = 60)),
      ("req5: psi=60 repeat", p.copy(psi = 60)),
    ))
  }

  test("T4: print the request table") {
    println(T4Cache.table(rows, "T4 caching: cold vs warm requests (santander, sf=0.05)"))
  }

  test("T4: hit/miss pattern matches the paper's description") {
    assert(rows.map(_.hit) == Seq(false, true, true, false, true))
  }

  test("T4: cached requests return the same CAP count as the cold run") {
    assert(rows(0).nCaps == rows(1).nCaps && rows(1).nCaps == rows(2).nCaps)
    assert(rows(3).nCaps == rows(4).nCaps)
  }

  test("T4: a warm request is much faster than the cold one") {
    val cold = rows(0).millis
    val warm = Seq(rows(1).millis, rows(2).millis).min
    assert(warm * 2 < cold,
      s"warm ${warm}ms should be well under cold ${cold}ms — cache not effective")
  }
}
