package repro.eval

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Clustering / linking evaluation measures used in the paper's tables.
  *
  * Macro, micro, and pairwise metrics follow Galárraga et al. (CIKM 2014)
  * as adopted by CESI and SIST:
  *  - macro precision: fraction of predicted clusters that are pure
  *    (all elements share one gold cluster); macro recall symmetric;
  *  - micro precision: (1/N) * sum over predicted clusters of the largest
  *    gold overlap; micro recall symmetric;
  *  - pairwise precision/recall over co-clustered element pairs.
  * Average F1 = mean(macro F1, micro F1, pairwise F1) — the paper's overall
  * canonicalization score. Linking accuracy = correctly linked mentions /
  * all mentions (unlinked mentions count as wrong).
  */
object Metrics {

  final case class ClusterScores(
      macroP: Double, macroR: Double, macroF1: Double,
      microP: Double, microR: Double, microF1: Double,
      pairP: Double, pairR: Double, pairF1: Double) {
    def avgF1: Double = (macroF1 + microF1 + pairF1) / 3.0

    override def toString: String =
      f"macro=$macroF1%.3f micro=$microF1%.3f pair=$pairF1%.3f avg=$avgF1%.3f"
  }

  private def f1(p: Double, r: Double): Double =
    if (p + r == 0) 0.0 else 2 * p * r / (p + r)

  private def ratio(num: Double, den: Double): Double =
    if (den == 0) 0.0 else num / den

  /** Score a clustering.
    *
    * @param assignment one row per element with columns `element`,
    *                   `pred_cluster`, `gold_cluster` (any orderable types).
    *                   Elements missing a predicted cluster must be given
    *                   singleton cluster ids by the caller.
    */
  def clusterScores(assignment: DataFrame): ClusterScores = {
    val cont = assignment
      .groupBy("pred_cluster", "gold_cluster")
      .agg(count(lit(1)).as("n"))
      .cache()

    val n = cont.agg(coalesce(sum("n"), lit(0L))).head.getLong(0).toDouble
    if (n == 0) { cont.unpersist(); return ClusterScores(0, 0, 0, 0, 0, 0, 0, 0, 0) }

    val perPred = cont.groupBy("pred_cluster").agg(
      sum("n").as("size"),
      max("n").as("max_overlap"),
      count(lit(1)).as("n_gold"),
    )
    val perGold = cont.groupBy("gold_cluster").agg(
      sum("n").as("size"),
      max("n").as("max_overlap"),
      count(lit(1)).as("n_pred"),
    )

    val predStats = perPred.agg(
      count(lit(1)).as("clusters"),
      sum(when(col("n_gold") === 1, 1L).otherwise(0L)).as("pure"),
      sum("max_overlap").as("overlap"),
      sum((col("size") * (col("size") - 1) / 2).cast("long")).as("pairs"),
    ).head
    val goldStats = perGold.agg(
      count(lit(1)).as("clusters"),
      sum(when(col("n_pred") === 1, 1L).otherwise(0L)).as("pure"),
      sum("max_overlap").as("overlap"),
      sum((col("size") * (col("size") - 1) / 2).cast("long")).as("pairs"),
    ).head
    val tpPairs = cont
      .agg(coalesce(sum((col("n") * (col("n") - 1) / 2).cast("long")), lit(0L)))
      .head.getLong(0).toDouble
    cont.unpersist()

    val macroP = ratio(predStats.getLong(1).toDouble, predStats.getLong(0).toDouble)
    val macroR = ratio(goldStats.getLong(1).toDouble, goldStats.getLong(0).toDouble)
    val microP = ratio(predStats.getLong(2).toDouble, n)
    val microR = ratio(goldStats.getLong(2).toDouble, n)
    val pairP = ratio(tpPairs, predStats.getLong(3).toDouble)
    val pairR = ratio(tpPairs, goldStats.getLong(3).toDouble)

    ClusterScores(macroP, macroR, f1(macroP, macroR),
                  microP, microR, f1(microP, microR),
                  pairP, pairR, f1(pairP, pairR))
  }

  /** Linking accuracy.
    *
    * @param links one row per mention with columns `pred_id` (nullable long,
    *              null/-1 = unlinked) and `gold_id` (long).
    */
  def linkingAccuracy(links: DataFrame): Double = {
    val row = links.agg(
      count(lit(1)).as("n"),
      coalesce(
        sum(when(col("pred_id").isNotNull && col("pred_id") === col("gold_id"), 1L)
          .otherwise(0L)),
        lit(0L)).as("ok"),
    ).head
    ratio(row.getLong(1).toDouble, row.getLong(0).toDouble)
  }
}
