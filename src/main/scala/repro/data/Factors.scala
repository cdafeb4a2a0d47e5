package repro.data

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** Deterministic pseudo-randomness for the synthetic smart-city data.
  *
  * Everything is a pure function of (dataset seed, factor/sensor id, time
  * index) via xxhash64, so the generated DataFrames are bit-identical
  * across runs and across Spark/DuckDB — a requirement for the oracle
  * checks and for the paper-exact record counts of T1.
  *
  * The temporal model is a latent-factor jump process: each *factor* f
  * fires events at random timestamps (rate `pEvent`); at an event it jumps
  * by ±mag. A sensor's series is the loading-weighted running sum of its
  * factors' jumps plus bounded noise. Sensors sharing a factor therefore
  * *co-evolve* exactly at that factor's event timestamps — the planted
  * ground truth the CAP miner must recover.
  */
object Factors {

  /** Uniform-ish [0,1) hash of the given columns plus a salt. */
  def hash01(salt: String, cols: Column*): Column =
    pmod(xxhash64((cols :+ lit(salt)): _*), lit(1000000L)).cast("double") / 1000000.0

  /** Signed jump of factor `factor` (a string column) at `tIdx`:
    * ±mag with probability `pEvent`, else 0. Empty-string factors never fire.
    */
  def jump(factor: Column, tIdx: Column, pEvent: Double, mag: Double): Column = {
    val fires = (factor =!= lit("")) && (hash01("evt", factor, tIdx) < pEvent)
    val dir = when(hash01("dir", factor, tIdx) < 0.5, lit(1.0)).otherwise(lit(-1.0))
    when(fires, dir * mag).otherwise(lit(0.0))
  }

  /** Bounded observation noise in [−amp/2, amp/2] per (sensor, t). */
  def noise(id: Column, tIdx: Column, amp: Double): Column =
    (hash01("noise", id, tIdx) - 0.5) * amp
}
