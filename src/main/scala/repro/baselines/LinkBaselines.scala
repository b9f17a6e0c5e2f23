package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.core.Candidates
import repro.synth.CkbDf
import repro.text.StringSim

/** Entity-linking baselines for Table 3. Every `link` method returns one
  * row per distinct NP: columns `text`, `pred_id` (nullable long).
  */
object LinkUtil {

  /** Candidate pool shared by the baselines: anchor-index exact matches
    * (with popularity) plus stem-index fuzzy matches (with Jaro-Winkler).
    */
  def pool(spark: SparkSession, phrases: DataFrame, ckb: CkbDf): DataFrame = {
    val jwUdf = udf((a: String, b: String) => StringSim.jaroWinkler(a, b))
    val nps = phrases.select(col(phrases.columns.head).as("np")).distinct()
    Candidates.entityCandidates(spark, nps, ckb, Map.empty, Candidates.Config(topK = 8))
      .join(ckb.entities.select(col("entity_id").as("cand_id"), col("name"), col("pop")),
        Seq("cand_id"))
      .withColumn("jw", jwUdf(col("np"), col("name")))
  }

  def pickTop(cands: DataFrame, score: org.apache.spark.sql.Column): DataFrame = {
    val w = Window.partitionBy("np").orderBy(score.desc, col("cand_id"))
    cands.withColumn("r", row_number().over(w))
      .filter(col("r") === 1)
      .select(col("np").as("text"), col("cand_id").as("pred_id"))
  }

  /** Complete a linking result so every phrase has a row (unlinked = null). */
  def complete(spark: SparkSession, phrases: DataFrame, links: DataFrame): DataFrame =
    phrases.select(col(phrases.columns.head).as("text")).distinct()
      .join(links, Seq("text"), "left")
      .select(col("text"), col("pred_id"))
}

/** DBpedia Spotlight stand-in: anchor popularity with a string-similarity
  * fallback, no joint reasoning.
  */
object Spotlight {
  def link(spark: SparkSession, phrases: DataFrame, ckb: CkbDf): DataFrame = {
    val cands = LinkUtil.pool(spark, phrases, ckb)
    val top = LinkUtil.pickTop(cands,
      col("f_pop") * 2.0 + col("jw") * 0.5 + log(lit(1.0) + col("pop")) * 0.01)
    LinkUtil.complete(spark, phrases, top)
  }
}

/** TagMe stand-in: commonness (popularity) weighted by coherence — a
  * candidate is boosted when it participates in a CKB fact with some
  * candidate of the other NP of the same triple.
  */
object Tagme {
  def link(spark: SparkSession, triples: DataFrame, ckb: CkbDf): DataFrame = {
    val phrases = triples.select(col("subj").as("np"))
      .union(triples.select(col("obj").as("np"))).distinct()
    // TagMe only annotates "spots" found verbatim in its anchor dictionary:
    // no fuzzy fallback, mentions without an exact anchor stay unlinked
    // (this is why it degrades on OIE-style noisy surface forms)
    val cands = LinkUtil.pool(spark, phrases, ckb).filter(col("f_pop") > 0).cache()

    // entity pairs related by any CKB fact (either direction)
    val related = ckb.facts.select(col("fs").as("e1"), col("fo").as("e2"))
      .union(ckb.facts.select(col("fo").as("e1"), col("fs").as("e2")))
      .distinct()

    val mentionPairs = triples.select(col("subj").as("np"), col("obj").as("other"))
      .union(triples.select(col("obj").as("np"), col("subj").as("other")))
      .distinct()

    val otherCands = cands.select(col("np").as("other"), col("cand_id").as("oc"))
    val coherence = mentionPairs
      .join(cands.select(col("np"), col("cand_id")), Seq("np"))
      .join(otherCands, Seq("other"))
      .join(related, col("cand_id") === col("e1") && col("oc") === col("e2"))
      .groupBy("np", "cand_id")
      .agg(count(lit(1)).as("votes"))

    val scored = cands.join(coherence, Seq("np", "cand_id"), "left")
      .na.fill(Map("votes" -> 0L))
    val top = LinkUtil.pickTop(scored,
      col("f_pop") * 1.5 + col("jw") * 0.3 + least(col("votes"), lit(3)) * 0.4)
    LinkUtil.complete(spark, phrases, top)
  }
}

/** Falcon stand-in: linguistic/morphological matching only — best string
  * similarity over alias surface forms, no popularity prior.
  */
object Falcon {
  def link(spark: SparkSession, phrases: DataFrame, ckb: CkbDf): DataFrame = {
    val cands = LinkUtil.pool(spark, phrases, ckb)
    val top = LinkUtil.pickTop(cands, col("jw") + col("f_emb") * 0.2)
    LinkUtil.complete(spark, phrases, top)
  }
}

/** EARL stand-in: joint per-triple assignment — the candidate combination
  * of (subject, object) maximizing string fit plus CKB connection density
  * (its GTSP objective), decided greedily per triple with majority vote
  * across triples per NP.
  */
object Earl {
  def link(spark: SparkSession, triples: DataFrame, ckb: CkbDf): DataFrame = {
    val phrases = triples.select(col("subj").as("np"))
      .union(triples.select(col("obj").as("np"))).distinct()
    val cands = LinkUtil.pool(spark, phrases, ckb).cache()

    val related = ckb.facts.select(col("fs").as("e1"), col("fo").as("e2")).distinct()

    val sc = cands.select(col("np").as("subj"), col("cand_id").as("se"),
      (col("jw") + col("f_emb") * 0.3).as("s_fit"))
    val oc = cands.select(col("np").as("obj"), col("cand_id").as("oe"),
      (col("jw") + col("f_emb") * 0.3).as("o_fit"))

    val combos = triples.select("triple_id", "subj", "obj")
      .join(sc, Seq("subj"))
      .join(oc, Seq("obj"))
      .join(related, col("se") === col("e1") && col("oe") === col("e2"), "left")
      .withColumn("connected", when(col("e1").isNotNull, 1.0).otherwise(0.0))
      .withColumn("score", col("s_fit") + col("o_fit") + col("connected") * 1.2)

    val w = Window.partitionBy("triple_id").orderBy(col("score").desc, col("se"), col("oe"))
    val best = combos.withColumn("r", row_number().over(w)).filter(col("r") === 1)

    // majority vote per NP over its triple-level decisions
    val votes = best.select(col("subj").as("text"), col("se").as("pred_id"))
      .union(best.select(col("obj").as("text"), col("oe").as("pred_id")))
      .groupBy("text", "pred_id").agg(count(lit(1)).as("n"))
    val wv = Window.partitionBy("text").orderBy(col("n").desc, col("pred_id"))
    val top = votes.withColumn("r", row_number().over(wv)).filter(col("r") === 1)
      .select("text", "pred_id")
    LinkUtil.complete(spark, phrases, top)
  }
}

/** KBPearl stand-in: pipeline — canonicalize first (IDF token overlap +
  * HAC), then link each group as a whole using popularity aggregated over
  * its members plus fact-inclusion support of the group's triples.
  */
object KbPearl {
  def link(spark: SparkSession, triples: DataFrame, ckb: CkbDf): DataFrame = {
    val phrases = triples.select(col("subj").as("np"))
      .union(triples.select(col("obj").as("np"))).distinct()
    val clusters = IdfTokenOverlap.cluster(spark, phrases, phrases, threshold = 0.5)
    val cands = LinkUtil.pool(spark, phrases, ckb)

    val related = ckb.facts.select(col("fs").as("e1"), col("fo").as("e2"))
      .union(ckb.facts.select(col("fo").as("e1"), col("fs").as("e2")))
      .distinct()
    val mentionPairs = triples.select(col("subj").as("np"), col("obj").as("other"))
      .union(triples.select(col("obj").as("np"), col("subj").as("other")))
      .distinct()
    val otherTop = Spotlight.link(spark, phrases, ckb)
      .select(col("text").as("other"), col("pred_id").as("oc"))
    val factSupport = mentionPairs
      .join(cands.select(col("np"), col("cand_id")), Seq("np"))
      .join(otherTop, Seq("other"))
      .join(related, col("cand_id") === col("e1") && col("oc") === col("e2"))
      .groupBy("np", "cand_id").agg(count(lit(1)).as("support"))

    val scored = cands
      .join(factSupport, Seq("np", "cand_id"), "left").na.fill(Map("support" -> 0L))
      .join(clusters.select(col("text").as("np"), col("cluster")), Seq("np"))
      .groupBy("cluster", "cand_id")
      .agg(sum(col("f_pop") + col("jw") * 0.2 + least(col("support"), lit(3)) * 0.5)
        .as("score"))
    val w = Window.partitionBy("cluster").orderBy(col("score").desc, col("cand_id"))
    val topPerCluster = scored.withColumn("r", row_number().over(w))
      .filter(col("r") === 1)
      .select(col("cluster"), col("cand_id").as("pred_id"))

    val links = clusters.join(topPerCluster, Seq("cluster"), "left")
      .select(col("text"), col("pred_id"))
    LinkUtil.complete(spark, phrases, links)
  }
}

/** Relation-linking baselines would mirror the above over
  * [[Candidates.relationCandidates]]; the paper reports them only in
  * Figure 3, which is out of scope (DESIGN.md §3).
  */
object RelationLinkNote
