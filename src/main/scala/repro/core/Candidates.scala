package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.synth.{CkbDf, Embeddings}
import repro.text.StringSim

/** Candidate generation for OKB linking: the state space of each linking
  * variable (paper §3.2.1) plus the unary linking features F4/F5/F6
  * (§3.2.3–§3.2.4).
  *
  * Entity candidates are retrieved through the anchor index (exact surface
  * match — this is where f_pop is defined) and through a stem/concept
  * inverted index over alias tokens (fuzzy retrieval for typos and synonym
  * variants, with f_pop = 0 since the mention is not an anchor surface).
  * Relation candidates are retrieved the same way over CKB relation aliases.
  */
object Candidates {

  final case class Config(topK: Int = 5)

  private val contentStemsUdf = udf((s: String) => StringSim.contentStems(s).distinct)
  private val conceptKeyUdf = udf { (stem: String) =>
    val m = "^w(\\d+)$".r
    stem match { case m(d) => "c" + (d.toLong / 8); case _ => null }
  }
  private val embSimUdf = udf((a: String, b: String) => Embeddings.sim(a, b))
  private val jwUdf = udf((a: String, b: String) => StringSim.jaroWinkler(a, b))
  private val ngramUdf = udf((a: String, b: String) => StringSim.ngramJaccard(a, b))
  private val ldUdf = udf((a: String, b: String) => StringSim.levenshteinSim(a, b))

  private def ppdbSimUdf(ppdb: Map[String, Long]) =
    udf { (a: String, b: String) =>
      (ppdb.get(a), ppdb.get(b)) match {
        case (Some(x), Some(y)) if x == y => 1.0
        case _ => 0.0
      }
    }

  private def stemKeys(df: DataFrame, textCol: String): DataFrame = {
    val stems = df.select(col(textCol), explode(contentStemsUdf(col(textCol))).as("stem"))
    stems.select(col(textCol), col("stem").as("key"))
      .union(stems.select(col(textCol), conceptKeyUdf(col("stem")).as("key")))
      .filter(col("key").isNotNull)
      .distinct()
  }

  /** Entity candidates for a set of NPs.
    *
    * @param nps single column `np` (distinct)
    * @return columns `np`, `cand_id`, `f_pop`, `f_emb`, `f_ppdb`, `rank`
    *         (rank 1..topK, deterministic)
    */
  def entityCandidates(spark: SparkSession, nps: DataFrame, ckb: CkbDf,
                       ppdb: Map[String, Long], cfg: Config = Config()): DataFrame = {
    val np = nps.select(col("np")).distinct().cache()

    // exact anchor matches: popularity prior f_pop = count(np, e) / count(np)
    val anchors = ckb.aliases.groupBy(col("alias"), col("entity_id"))
      .agg(sum("anchor_count").as("cnt"))
    val exact = np.join(anchors, np("np") === anchors("alias"))
      .select(col("np"), col("entity_id"), col("cnt"))
    val totals = exact.groupBy("np").agg(sum("cnt").as("total"))
    val exactScored = exact.join(totals, "np")
      .select(col("np"), col("entity_id"), (col("cnt") / col("total")).as("f_pop"))

    // fuzzy retrieval via stem / concept keys over alias tokens
    val aliasKeys = stemKeys(ckb.aliases.select("alias").distinct(), "alias")
    val npKeys = stemKeys(np.withColumnRenamed("np", "np_text"), "np_text")
    val fuzzy = npKeys.join(aliasKeys, "key")
      .select(col("np_text").as("np"), col("alias"))
      .distinct()
      .join(ckb.aliases.select("alias", "entity_id").distinct(), Seq("alias"))
      .withColumn("jw", jwUdf(col("np"), col("alias")))
      .groupBy("np", "entity_id").agg(max("jw").as("jw"))

    val merged = fuzzy.as("f")
      .join(exactScored.as("e"), Seq("np", "entity_id"), "full")
      .select(
        col("np"), col("entity_id"),
        coalesce(col("f_pop"), lit(0.0)).as("f_pop"),
        coalesce(col("jw"), lit(1.0)).as("jw"), // exact-only rows: jw = 1
      )

    val withFeats = merged
      .join(ckb.entities.select(col("entity_id"), col("name")), Seq("entity_id"))
      .withColumn("f_emb", embSimUdf(col("np"), col("name")))
      .withColumn("f_ppdb", ppdbSimUdf(ppdb)(col("np"), col("name")))

    val w = Window.partitionBy("np").orderBy(
      (col("f_pop") * 0.8 + col("jw") * 0.6 + col("f_emb") * 0.6).desc,
      col("entity_id"))
    withFeats
      .withColumn("rank", row_number().over(w))
      .filter(col("rank") <= cfg.topK)
      .select(col("np"), col("entity_id").as("cand_id"),
        col("f_pop"), col("f_emb"), col("f_ppdb"), col("rank"))
  }

  /** Relation candidates for a set of RPs.
    *
    * @param rps single column `rp` (distinct)
    * @return columns `rp`, `cand_id`, `f_ngram`, `f_ld`, `f_emb`, `f_ppdb`, `rank`
    */
  def relationCandidates(spark: SparkSession, rps: DataFrame, ckb: CkbDf,
                         ppdb: Map[String, Long], cfg: Config = Config()): DataFrame = {
    val rp = rps.select(col("rp")).distinct().cache()

    val relAliasKeys = stemKeys(ckb.relAliases.select("alias").distinct(), "alias")
    val rpKeys = stemKeys(rp.withColumnRenamed("rp", "rp_text"), "rp_text")
    val cand = rpKeys.join(relAliasKeys, "key")
      .select(col("rp_text").as("rp"), col("alias"))
      .distinct()
      .join(ckb.relAliases, Seq("alias"))
      .select("rp", "rel_id")
      .distinct()

    val withFeats = cand
      .join(ckb.relations.select(col("rel_id"), col("name")), Seq("rel_id"))
      .withColumn("f_ngram", ngramUdf(col("rp"), col("name")))
      .withColumn("f_ld", ldUdf(col("rp"), col("name")))
      .withColumn("f_emb", embSimUdf(col("rp"), col("name")))
      .withColumn("f_ppdb", ppdbSimUdf(ppdb)(col("rp"), col("name")))

    val w = Window.partitionBy("rp").orderBy(
      (col("f_emb") + col("f_ngram")).desc, col("rel_id"))
    withFeats
      .withColumn("rank", row_number().over(w))
      .filter(col("rank") <= cfg.topK)
      .select(col("rp"), col("rel_id").as("cand_id"),
        col("f_ngram"), col("f_ld"), col("f_emb"), col("f_ppdb"), col("rank"))
  }
}
