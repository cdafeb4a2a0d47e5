package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel

/** Connected components over an undirected edge list, as a DataFrame
  * fixpoint iteration (MISCELA step 3: "discovering spatially connected
  * sets of sensors").
  *
  * Algorithm: min-label propagation. Every vertex starts labelled with its
  * own id; each round a vertex takes the minimum label among itself and its
  * neighbours; converged when no label changes. Rounds = graph diameter,
  * which for η-proximity graphs of sensor deployments is small (sensors
  * cluster into compact blobs). Lineage is cut with localCheckpoint each
  * round so the plan does not grow unboundedly.
  */
object ConnectedComponents {

  /** Assigns a component label to every vertex.
    *
    * @param vertices single-column DataFrame of vertex ids (column `id`);
    *                 must include isolated vertices (they become singleton
    *                 components)
    * @param edges    DataFrame with columns (src, dst); direction ignored
    * @return DataFrame (id, component) where `component` is the minimum
    *         vertex id in the component
    * @param maxIterations safety bound; the fixpoint normally converges in
    *                      a handful of rounds
    */
  def run(
      spark: SparkSession,
      vertices: DataFrame,
      edges: DataFrame,
      maxIterations: Int = 50,
  ): DataFrame = {
    val sym = edges
      .select(col("src").as("u"), col("dst").as("v"))
      .union(edges.select(col("dst").as("u"), col("src").as("v")))
      .distinct()
      .persist(StorageLevel.MEMORY_AND_DISK)

    var labels = vertices
      .select(col("id"))
      .distinct()
      .withColumn("component", col("id"))
      .localCheckpoint()

    var converged = false
    var iter = 0
    while (!converged && iter < maxIterations) {
      // Candidate label for each vertex: min over neighbours' labels.
      val fromNeighbours = sym
        .join(labels.withColumnRenamed("id", "v"), "v")
        .groupBy(col("u").as("id"))
        .agg(min("component").as("nbr"))

      val next = labels
        .join(fromNeighbours, Seq("id"), "left")
        .select(
          col("id"),
          least(col("component"), coalesce(col("nbr"), col("component"))).as("component"),
          (col("nbr").isNotNull && col("nbr") < col("component")).as("changed"),
        )
        .localCheckpoint()

      converged = next.where(col("changed")).isEmpty
      labels = next.select("id", "component")
      iter += 1
    }
    sym.unpersist()
    require(converged, s"connected components did not converge in $maxIterations iterations")
    labels
  }
}
