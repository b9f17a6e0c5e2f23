package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.cluster.Hac
import repro.core.{Blocking, Candidates}
import repro.synth.CkbDf
import repro.text.StringSim

/** Shared plumbing for the canonicalization baselines: all of them produce
  * a clustering DataFrame (`text`, `cluster`) over a phrase set, most by
  * running average-linkage HAC over a similarity pair list computed on
  * Spark (similarities distributed, merge loop on the driver — the pair
  * list is tiny compared to the data).
  */
object BaselineUtil {

  /** Wide-recall blocked pairs with sim columns for baseline use. */
  def widePairs(spark: SparkSession, phrases: DataFrame, freqBase: DataFrame): DataFrame =
    Blocking.pairs(spark,
      phrases.select(col(phrases.columns.head).as("phrase")),
      freqBase.select(col(freqBase.columns.head).as("phrase")),
      Blocking.Config(idfThreshold = 0.2, embThreshold = 0.4))

  /** Run HAC over (p1, p2, sim) pairs; elements absent from any pair become
    * singletons.
    */
  def hacClusters(spark: SparkSession, elements: DataFrame, pairs: DataFrame,
                  threshold: Double): DataFrame = {
    import spark.implicits._
    val elems = elements.select(col(elements.columns.head).as("text"))
      .distinct().as[String].collect().toSeq.sorted
    val sims = pairs.select(col("p1"), col("p2"), col("sim"))
      .as[(String, String, Double)].collect().toSeq
    val assign = Hac.cluster(elems, sims, threshold)
    assign.toSeq.map { case (t, c) => (t, "c" + c) }.toDF("text", "cluster")
  }
}

/** Morph Norm (Fader et al. 2011): cluster phrases whose morphologically
  * normalized forms are identical.
  */
object MorphNorm {
  private val norm = udf((s: String) => StringSim.morphNormalize(s))

  def cluster(spark: SparkSession, phrases: DataFrame): DataFrame =
    phrases.select(col(phrases.columns.head).as("text")).distinct()
      .withColumn("cluster", norm(col("text")))
}

/** Wikidata Integrator stand-in: an off-the-shelf entity-linking tool used
  * for canonicalization — link every NP independently by anchor popularity
  * (+ fuzzy string fallback), then group NPs by the linked entity.
  */
object WikidataIntegrator {
  def cluster(spark: SparkSession, phrases: DataFrame, ckb: CkbDf): DataFrame = {
    val links = Spotlight.link(spark, phrases, ckb)
    links.select(col("text"),
      when(col("pred_id").isNotNull, concat(lit("e"), col("pred_id")))
        .otherwise(concat(lit("nil:"), col("text"))).as("cluster"))
  }
}

/** Text Similarity (Galárraga et al. 2014): Jaro-Winkler + HAC. */
object TextSimilarity {
  private val jw = udf((a: String, b: String) => StringSim.jaroWinkler(a, b))

  def cluster(spark: SparkSession, phrases: DataFrame, freqBase: DataFrame,
              threshold: Double = 0.85): DataFrame = {
    val pairs = BaselineUtil.widePairs(spark, phrases, freqBase)
      .withColumn("sim", jw(col("p1"), col("p2")))
    BaselineUtil.hacClusters(spark, phrases, pairs, threshold)
  }
}

/** IDF Token Overlap (Galárraga et al. 2014): Sim_idf + HAC. */
object IdfTokenOverlap {
  def cluster(spark: SparkSession, phrases: DataFrame, freqBase: DataFrame,
              threshold: Double = 0.5): DataFrame = {
    val pairs = BaselineUtil.widePairs(spark, phrases, freqBase)
      .withColumn("sim", col("sim_idf"))
    BaselineUtil.hacClusters(spark, phrases, pairs, threshold)
  }
}

/** Attribute Overlap (Galárraga et al. 2014): Jaccard similarity of the
  * attribute sets of two subject NPs, where an attribute is a normalized
  * (relation phrase, object) pair the NP occurs with.
  */
object AttributeOverlap {
  private val norm = udf((s: String) => StringSim.morphNormalize(s))

  def cluster(spark: SparkSession, triples: DataFrame,
              threshold: Double = 0.3): DataFrame = {
    val attrs = triples.select(
      col("subj").as("text"),
      concat_ws("|", norm(col("pred")), norm(col("obj"))).as("attr"),
    ).distinct().cache()
    val sizes = attrs.groupBy("text").agg(count(lit(1)).as("n"))

    val inter = attrs.as("a")
      .join(attrs.as("b"), col("a.attr") === col("b.attr") && col("a.text") < col("b.text"))
      .groupBy(col("a.text").as("p1"), col("b.text").as("p2"))
      .agg(count(lit(1)).as("inter"))
    val pairs = inter
      .join(sizes.select(col("text").as("p1"), col("n").as("n1")), Seq("p1"))
      .join(sizes.select(col("text").as("p2"), col("n").as("n2")), Seq("p2"))
      .select(col("p1"), col("p2"),
        (col("inter") / (col("n1") + col("n2") - col("inter"))).as("sim"))

    BaselineUtil.hacClusters(spark, triples.select(col("subj")), pairs, threshold)
  }
}

/** CESI stand-in (Vashishth et al. 2018): canonicalization with learned
  * embeddings refined by side information — realized here as HAC over a
  * blend of embedding, IDF, and PPDB similarities (the synthetic embedding
  * already plays the role of CESI's trained NP/RP vectors).
  */
object Cesi {
  def cluster(spark: SparkSession, phrases: DataFrame, freqBase: DataFrame,
              ppdb: Map[String, Long], threshold: Double = 0.45): DataFrame = {
    val ppdbSim = udf { (a: String, b: String) =>
      (ppdb.get(a), ppdb.get(b)) match {
        case (Some(x), Some(y)) if x == y => 1.0
        case _ => 0.0
      }
    }
    val pairs = BaselineUtil.widePairs(spark, phrases, freqBase)
      .withColumn("sim",
        col("sim_emb") * 0.45 + col("sim_idf") * 0.25 +
          ppdbSim(col("p1"), col("p2")) * 0.30)
    BaselineUtil.hacClusters(spark, phrases, pairs, threshold)
  }
}

/** SIST stand-in (Lin & Chen 2019): CESI's signals plus side information
  * from the source text. We have no source text (DESIGN.md §1.3); the role
  * of its entity/type side information is played by candidate-entity
  * agreement — two NPs whose top candidate entities coincide get a boost.
  */
object Sist {
  def cluster(spark: SparkSession, phrases: DataFrame, freqBase: DataFrame,
              ckb: CkbDf, ppdb: Map[String, Long],
              threshold: Double = 0.5): DataFrame = {
    val ppdbSim = udf { (a: String, b: String) =>
      (ppdb.get(a), ppdb.get(b)) match {
        case (Some(x), Some(y)) if x == y => 1.0
        case _ => 0.0
      }
    }
    val top = Candidates
      .entityCandidates(spark, phrases.select(col(phrases.columns.head).as("np")),
        ckb, ppdb, Candidates.Config(topK = 1))
      .select(col("np"), col("cand_id"))
    val pairs = BaselineUtil.widePairs(spark, phrases, freqBase)
      .join(top.select(col("np").as("p1"), col("cand_id").as("c1")), Seq("p1"), "left")
      .join(top.select(col("np").as("p2"), col("cand_id").as("c2")), Seq("p2"), "left")
      .withColumn("cand_agree",
        when(col("c1").isNotNull && col("c1") === col("c2"), 1.0).otherwise(0.0))
      .withColumn("sim",
        col("sim_emb") * 0.35 + col("sim_idf") * 0.20 +
          ppdbSim(col("p1"), col("p2")) * 0.20 + col("cand_agree") * 0.25)
    BaselineUtil.hacClusters(spark, phrases, pairs, threshold)
  }

  /** SIST for relation phrases: same blend over RP candidates. */
  def clusterRp(spark: SparkSession, rps: DataFrame, ckb: CkbDf,
                ppdb: Map[String, Long], threshold: Double = 0.45): DataFrame = {
    val ppdbSim = udf { (a: String, b: String) =>
      (ppdb.get(a), ppdb.get(b)) match {
        case (Some(x), Some(y)) if x == y => 1.0
        case _ => 0.0
      }
    }
    val top = Candidates
      .relationCandidates(spark, rps.select(col(rps.columns.head).as("rp")),
        ckb, ppdb, Candidates.Config(topK = 1))
      .select(col("rp"), col("cand_id"))
    // RPs lean on the discrete side signals: embeddings are confusable
    // across near-synonymous relations, so they get a smaller vote here
    val pairs = BaselineUtil.widePairs(spark, rps, rps)
      .join(top.select(col("rp").as("p1"), col("cand_id").as("c1")), Seq("p1"), "left")
      .join(top.select(col("rp").as("p2"), col("cand_id").as("c2")), Seq("p2"), "left")
      .withColumn("cand_agree",
        when(col("c1").isNotNull && col("c1") === col("c2"), 1.0).otherwise(0.0))
      .withColumn("sim",
        col("sim_emb") * 0.20 + col("sim_idf") * 0.30 +
          ppdbSim(col("p1"), col("p2")) * 0.30 + col("cand_agree") * 0.20)
    BaselineUtil.hacClusters(spark, rps, pairs, threshold)
  }
}
