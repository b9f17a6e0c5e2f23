package repro.cluster

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Connected components by iterative minimum-label propagation on Spark
  * DataFrames (used for JOCL's final cluster formation and for the
  * AMIE / PATTY rule-graph baselines).
  *
  * Each iteration every vertex adopts the minimum component label among
  * itself and its neighbors; convergence is reached when no label changes.
  * Cluster graphs here are unions of near-cliques, so the label diameter is
  * tiny and the loop converges in a handful of rounds.
  */
object ConnectedComponents {

  /** @param vertices single column `id` (long)
    * @param edges    columns `src`, `dst` (long); direction is ignored
    * @return columns `id`, `component` (component = minimum vertex id)
    */
  def run(spark: SparkSession, vertices: DataFrame, edges: DataFrame,
          maxIter: Int = 50): DataFrame = {
    val sym = edges.select(col("src"), col("dst"))
      .union(edges.select(col("dst").as("src"), col("src").as("dst")))
      .distinct()
      .localCheckpoint(true)

    var labels = vertices.select(col("id"), col("id").as("component"))
      .localCheckpoint(true)

    var iter = 0
    var changed = 1L
    while (changed > 0 && iter < maxIter) {
      val neighborMin = sym
        .join(labels, sym("src") === labels("id"))
        .groupBy(col("dst").as("nid"))
        .agg(min("component").as("nbr_component"))
      val updated = labels
        .join(neighborMin, labels("id") === neighborMin("nid"), "left")
        .select(
          col("id"),
          least(col("component"), coalesce(col("nbr_component"), col("component")))
            .as("component"),
          (col("nbr_component").isNotNull && col("nbr_component") < col("component"))
            .as("changed"),
        )
        .localCheckpoint(true)
      changed = updated.filter(col("changed")).count()
      labels = updated.select("id", "component")
      iter += 1
    }
    labels
  }
}
