package repro.evolve

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** MISCELA step 2: extract evolving timestamps.
  *
  * A sensor *evolves* at timestamp t if the change from the previous
  * timestamp exceeds the evolving rate ε: |v(t) − v(t−1)| > ε. The sign of
  * the change is kept because co-evolution under the default SameSign
  * policy requires all sensors of a pattern to move the same way.
  *
  * Pure window dataflow: lag over (partition by sensor, order by time).
  */
object EvolvingTimestamps {

  /** From a smoothed series (id, tIdx, value) to evolving events
    * (id, tIdx, sign) with sign ∈ {−1, +1}.
    */
  def extract(smoothed: DataFrame, epsilon: Double): DataFrame = {
    require(epsilon >= 0, s"epsilon must be non-negative, got $epsilon")
    val w = Window.partitionBy("id").orderBy("tIdx")
    smoothed
      .withColumn("delta", col("value") - lag("value", 1).over(w))
      .where(col("delta").isNotNull && abs(col("delta")) > epsilon)
      .select(
        col("id"),
        col("tIdx"),
        when(col("delta") > 0, lit(1)).otherwise(lit(-1)).as("sign"),
      )
  }
}
