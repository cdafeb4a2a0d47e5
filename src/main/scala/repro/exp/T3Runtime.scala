package repro.exp

import org.apache.spark.sql.SparkSession

import repro.core.{CapParams, Miscela}
import repro.data.SmartCityDataset

/** T3 — MISCELA's pruned CAP search versus the brute-force baseline.
  *
  * The demo paper motivates caching with "MISCELA may take a long time";
  * the underlying MDM'19 evaluation's headline is that the pruned tree
  * search beats naive enumeration by growing factors as the search space
  * widens (larger maxSensors, lower ψ). We reproduce the *shape*: both
  * return identical CAP sets, MISCELA is faster, and the gap widens with
  * the candidate-space size.
  */
object T3Runtime {

  final case class RuntimeRow(
      config: String,
      nCaps: Long,
      miscelaMs: Long,
      naiveMs: Long,
      speedup: Double,
      sameResults: Boolean,
  )

  /** Runs both miners under `params` and compares results + wall time. */
  def compare(spark: SparkSession, ds: SmartCityDataset, params: CapParams, config: String): RuntimeRow = {
    def canon(caps: Seq[repro.core.Cap]) =
      caps.map(c => (c.attributes.mkString(","), c.sensors.mkString(","), c.support)).sorted

    val (miscela, msM) = Tables.timed {
      Miscela.mine(spark, ds.data, ds.locations, params).collect().toSeq
    }
    val (naive, msN) = Tables.timed {
      Miscela.mine(spark, ds.data, ds.locations, params, useNaive = true).collect().toSeq
    }
    RuntimeRow(config, miscela.size.toLong, msM, msN,
      msN.toDouble / math.max(1L, msM), canon(miscela) == canon(naive))
  }

  /** Search-stage-only comparison: stages 1–3 run once, then both search
    * strategies are timed on the identical in-memory components. This
    * isolates the algorithmic gap from the (shared) dataflow overhead.
    */
  def compareSearchOnly(
      spark: SparkSession,
      ds: SmartCityDataset,
      params: CapParams,
      config: String,
  ): RuntimeRow = {
    val comps = Miscela.assembleComponents(spark, ds.data, ds.locations, params)
    def run(naive: Boolean): Seq[repro.core.Cap] =
      comps.flatMap { case (sensors, edges, nT) =>
        Miscela.searchAssembled(sensors, edges, nT, params, useNaive = naive)
      }
    val (miscela, msM) = Tables.timed(run(naive = false))
    val (naive, msN) = Tables.timed(run(naive = true))
    def canon(caps: Seq[repro.core.Cap]) =
      caps.map(c => (c.attributes.mkString(","), c.sensors.mkString(","), c.support)).sorted
    RuntimeRow(config, miscela.size.toLong, msM, msN,
      msN.toDouble / math.max(1L, msM), canon(miscela) == canon(naive))
  }

  def table(rows: Seq[RuntimeRow], title: String): String =
    Tables.render(title,
      Seq("config", "#CAPs", "miscela ms", "naive ms", "speedup", "identical results"),
      rows.map(r => Seq(r.config, r.nCaps.toString, r.miscelaMs.toString, r.naiveMs.toString,
        f"${r.speedup}%.2fx", r.sameResults.toString)))
}
