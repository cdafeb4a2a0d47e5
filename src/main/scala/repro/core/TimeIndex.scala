package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Dense integer index over the dataset's synchronized timestamps.
  *
  * The paper requires "timestamps must be the same time intervals" and all
  * sensors synchronized, so the distinct timestamps of `data.csv` form one
  * global grid; bitsets in the CAP search are indexed by position on that
  * grid.
  */
object TimeIndex {

  /** (time, tIdx) mapping, tIdx dense from 0 in time order. */
  def build(data: DataFrame): DataFrame = {
    // The distinct-timestamp set is small (thousands); a global window is fine.
    val w = Window.orderBy("time")
    data
      .select(col("time"))
      .distinct()
      .withColumn("tIdx", (row_number().over(w) - 1).cast("int"))
  }

  /** Attaches tIdx to every record of `data` (columns id, attribute, time, data). */
  def attach(data: DataFrame): DataFrame =
    data.join(build(data), Seq("time"))
}
