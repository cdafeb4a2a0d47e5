package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.{CapParams, SignPolicy}

/** Shared plumbing for the spark-submit entrypoints: session construction
  * and `--key value` argument parsing with typed accessors.
  */
object JobUtil {

  def session(appName: String): SparkSession =
    SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .getOrCreate()

  final case class Args(kv: Map[String, String]) {
    def str(key: String, default: String): String = kv.getOrElse(key, default)
    def dbl(key: String, default: Double): Double = kv.get(key).map(_.toDouble).getOrElse(default)
    def int(key: String, default: Int): Int = kv.get(key).map(_.toInt).getOrElse(default)
    def bool(key: String, default: Boolean): Boolean = kv.get(key).map(_.toBoolean).getOrElse(default)

    /** CAP parameters from --epsilon/--eta/--mu/--psi/--delta/--sign/--max-sensors. */
    def capParams(base: CapParams = CapParams()): CapParams = base.copy(
      epsilon = dbl("epsilon", base.epsilon),
      etaKm = dbl("eta", base.etaKm),
      mu = int("mu", base.mu),
      psi = int("psi", base.psi),
      delta = dbl("delta", base.delta),
      signPolicy = SignPolicy.fromString(str("sign", base.signPolicy.toString)),
      maxSensors = int("max-sensors", base.maxSensors),
      allowSingleAttribute = bool("allow-single-attr", base.allowSingleAttribute),
    )
  }

  def parse(args: Array[String]): Args = {
    val kv = args.sliding(2, 2).collect {
      case Array(k, v) if k.startsWith("--") => k.stripPrefix("--") -> v
    }.toMap
    Args(kv)
  }
}
