package repro.core

import scala.collection.mutable

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.synth.OkbDf

/** Decoding of BP beliefs into the joint result (paper §3.5): the best
  * label per variable, followed by the conflict-resolution rule — if a pair
  * of phrases sits in two different linking groups but its canonicalization
  * variable says 1, both take the label of the LARGER group — and the final
  * canonicalization groups.
  */
object Inference {

  /** Per-slot decoded result.
    *
    * @param links    columns `text`, `pred_id` (nullable long; null = NIL)
    * @param clusters columns `text`, `cluster` (string cluster label)
    */
  final case class SlotResult(links: DataFrame, clusters: DataFrame)

  /** Decode beliefs for all three slots.
    *
    * @param beliefs columns `var_id`, `belief` (array<double>) from an LBP engine
    * @return map keyed by "subj" / "pred" / "obj"
    */
  def decode(spark: SparkSession, okb: OkbDf, graph: GraphBuilder.BuiltGraph,
             beliefs: DataFrame): Map[String, SlotResult] = {
    import spark.implicits._

    val states = graph.vars.map(v => (v.id, v.states)).toDF("var_id", "states")

    // linking decisions: argmax state -> external id
    val linkDecisions: Map[(String, String), Long] = graph.mentions
      .join(beliefs, "var_id")
      .join(states, "var_id")
      .select(col("slot"), col("text"), col("belief"), col("states"))
      .as[(String, String, Array[Double], Array[Long])]
      .collect()
      .map { case (slot, text, belief, sts) =>
        var best = 0
        var i = 1
        while (i < belief.length) { if (belief(i) > belief(best)) best = i; i += 1 }
        (slot, text) -> sts(best)
      }
      .toMap

    // pair decisions: P(x = 1) with acceptance at 0.5
    val pairDecisions: Seq[(String, String, String, Double)] = graph.pairs
      .join(beliefs, "var_id")
      .select(col("slot"), col("p1"), col("p2"), col("belief"))
      .as[(String, String, String, Array[Double])]
      .collect()
      .toSeq
      .map { case (slot, p1, p2, b) => (slot, p1, p2, b(1)) }

    Seq("subj", "pred", "obj").map { slot =>
      val phrases = (slot match {
        case "subj" => okb.triples.select(col("subj").as("text"))
        case "pred" => okb.triples.select(col("pred").as("text"))
        case "obj" => okb.triples.select(col("obj").as("text"))
      }).distinct().as[String].collect().sorted

      // initial labels from linking (or NIL singletons)
      val label = mutable.Map[String, String]()
      phrases.foreach { t =>
        label(t) = linkDecisions.get((slot, t)) match {
          case Some(id) if id >= 0 => "e" + id
          case _ => "nil:" + t
        }
      }
      val members = mutable.Map[String, mutable.Set[String]]()
      label.foreach { case (t, l) => members.getOrElseUpdate(l, mutable.Set()) += t }

      // conflict resolution: accepted pairs across different groups merge
      // into the larger group (stable order: by confidence desc, then pair)
      val accepted = pairDecisions
        .filter { case (s, _, _, p) => s == slot && p > 0.5 }
        .sortBy { case (_, p1, p2, p) => (-p, p1, p2) }
      accepted.foreach { case (_, p1, p2, _) =>
        val l1 = label(p1); val l2 = label(p2)
        if (l1 != l2) {
          val (winner, loser) =
            if (members(l1).size > members(l2).size) (l1, l2)
            else if (members(l2).size > members(l1).size) (l2, l1)
            else if (l1 < l2) (l1, l2) else (l2, l1)
          members(loser).foreach { t => label(t) = winner; members(winner) += t }
          members.remove(loser)
        }
      }

      val rows = phrases.toSeq.map { t =>
        val l = label(t)
        val linked: java.lang.Long =
          if (l.startsWith("e")) java.lang.Long.valueOf(l.drop(1)) else null
        (t, linked, l)
      }
      val links = rows.map { case (t, id, _) => (t, Option(id).map(_.longValue)) }
        .toDF("text", "pred_id")
      val clusters = rows.map { case (t, _, l) => (t, l) }.toDF("text", "cluster")
      slot -> SlotResult(links, clusters)
    }.toMap
  }
}
