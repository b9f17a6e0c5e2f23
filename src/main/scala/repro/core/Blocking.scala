package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.synth.Embeddings
import repro.text.StringSim

/** Pair-variable generation for OKB canonicalization (paper §4.1: pair
  * variables are created only for phrase pairs with IDF token overlap above
  * a threshold of 0.5).
  *
  * Candidate pairs come from an inverted index over content-word stems plus
  * an embedding-concept bucket (a canopy in CESI's style) so that synonym
  * pairs that share no literal token can still receive a pair variable; a
  * pair is kept when its stem-level IDF overlap or embedding similarity
  * clears the threshold. All similarity columns needed by the F1/F2/F3
  * feature functions are attached here.
  */
object Blocking {

  final case class Config(
      idfThreshold: Double = 0.5,
      embThreshold: Double = 0.6,
      /** postings longer than this are dropped (hub tokens carry no signal). */
      maxPosting: Int = 800,
      /** paraphrase dictionary: phrases in the same group always get a pair
        * variable (the only blocking route for acronym aliases, which share
        * neither tokens nor embedding mass with their expansions).
        */
      ppdb: Map[String, Long] = Map.empty,
  )

  private val tokensUdf = udf((s: String) => StringSim.tokens(s))
  private val contentStemsUdf = udf((s: String) => StringSim.contentStems(s).distinct)
  private val embSimUdf = udf((a: String, b: String) => Embeddings.sim(a, b))

  /** Embedding-concept bucket key of a content stem (`w336` -> `c42`). */
  private val conceptKeyUdf = udf { (stem: String) =>
    val m = "^w(\\d+)$".r
    stem match {
      case m(d) => "c" + (d.toLong / 8)
      case _ => null
    }
  }

  /** Per-token IDF weights (1 / log(1 + f)) over a phrase collection.
    *
    * @param phrases single column `phrase` — the collection defining f(x)
    * @return columns `token`, `freq`, `w`
    */
  def tokenWeights(phrases: DataFrame): DataFrame =
    phrases.select(explode(tokensUdf(col("phrase"))).as("token"))
      .groupBy("token").agg(count(lit(1)).as("freq"))
      .withColumn("w", lit(1.0) / log(lit(1.0) + col("freq")))

  /** Blocked pairs with their canonicalization similarities.
    *
    * @param phrases   distinct phrases of one slot, single column `phrase`
    * @param freqBase  phrase collection defining token frequencies (e.g. the
    *                  union of subject and object NPs, per the paper)
    * @return columns `p1`, `p2` (p1 < p2), `sim_idf`, `sim_idf_stem`, `sim_emb`
    */
  def pairs(spark: SparkSession, phrases: DataFrame, freqBase: DataFrame,
            cfg: Config = Config()): DataFrame = {
    val ph = phrases.select(col("phrase")).distinct().cache()

    // --- candidate generation: shared content stem, concept bucket, or
    //     shared paraphrase-dictionary group ------------------------------
    val ppdbMap = cfg.ppdb
    val ppdbKeyUdf = udf((s: String) => ppdbMap.get(s).map("p" + _).orNull)
    val stems = ph.select(col("phrase"), explode(contentStemsUdf(col("phrase"))).as("stem"))
    val keys = stems.select(col("phrase"), col("stem").as("key"))
      .union(stems.select(col("phrase"), conceptKeyUdf(col("stem")).as("key")))
      .union(ph.select(col("phrase"), ppdbKeyUdf(col("phrase")).as("key")))
      .filter(col("key").isNotNull)
      .distinct()
    val keyCounts = keys.groupBy("key").agg(count(lit(1)).as("n"))
      .filter(col("n") <= cfg.maxPosting)
    val usable = keys.join(keyCounts, "key")
    val cand = usable.as("a")
      .join(usable.as("b"), col("a.key") === col("b.key") && col("a.phrase") < col("b.phrase"))
      .select(col("a.phrase").as("p1"), col("b.phrase").as("p2"))
      .distinct()
      .cache()

    // --- exact IDF token overlap on raw tokens and on stems --------------
    def idfSim(tokenize: org.apache.spark.sql.Column => org.apache.spark.sql.Column,
               weights: DataFrame, simName: String): DataFrame = {
      val tok = ph.select(col("phrase"), explode(tokenize(col("phrase"))).as("token"))
        .distinct()
        .join(weights.select("token", "w"), Seq("token"), "left")
        .na.fill(Map("w" -> 1.0 / math.log(2.0))) // unseen words count as f=1
      val selfW = tok.groupBy("phrase").agg(sum("w").as("wsum"))
      val inter = cand
        .join(tok.select(col("phrase").as("p1"), col("token"), col("w").as("w1")), Seq("p1"))
        .join(tok.select(col("phrase").as("p2"), col("token")), Seq("p2", "token"))
        .groupBy("p1", "p2").agg(sum("w1").as("inter"))
      cand
        .join(inter, Seq("p1", "p2"), "left").na.fill(Map("inter" -> 0.0))
        .join(selfW.select(col("phrase").as("p1"), col("wsum").as("w1sum")), Seq("p1"))
        .join(selfW.select(col("phrase").as("p2"), col("wsum").as("w2sum")), Seq("p2"))
        .select(col("p1"), col("p2"),
          (col("inter") / (col("w1sum") + col("w2sum") - col("inter"))).as(simName))
    }

    val rawW = tokenWeights(freqBase.select(col(freqBase.columns.head).as("phrase")))
    val simRaw = idfSim(tokensUdf(_), rawW, "sim_idf")

    // stem-level weights: frequency of each stem over the collection
    val stemFreq = freqBase.select(col(freqBase.columns.head).as("phrase"))
      .select(explode(contentStemsUdf(col("phrase"))).as("token"))
      .groupBy("token").agg(count(lit(1)).as("freq"))
      .withColumn("w", lit(1.0) / log(lit(1.0) + col("freq")))
    val simStem = idfSim(c => contentStemsUdf(c), stemFreq, "sim_idf_stem")

    val ppdbSameUdf = udf { (a: String, b: String) =>
      (ppdbMap.get(a), ppdbMap.get(b)) match {
        case (Some(x), Some(y)) if x == y => 1.0
        case _ => 0.0
      }
    }
    val out = simRaw
      .join(simStem, Seq("p1", "p2"))
      .withColumn("sim_emb", embSimUdf(col("p1"), col("p2")))
      .filter(col("sim_idf_stem") >= cfg.idfThreshold ||
        col("sim_emb") >= cfg.embThreshold ||
        ppdbSameUdf(col("p1"), col("p2")) === 1.0)

    out
  }

  /** Top-`k` most similar blocked partners per phrase — a guardrail against
    * quadratic blow-up on hub-heavy inputs; used by graph construction.
    */
  def capPerPhrase(pairs: DataFrame, k: Int): DataFrame = {
    val scored = pairs.withColumn("score", greatest(col("sim_idf_stem"), col("sim_emb")))
    val w1 = Window.partitionBy("p1").orderBy(col("score").desc, col("p2"))
    val w2 = Window.partitionBy("p2").orderBy(col("score").desc, col("p1"))
    scored
      .withColumn("r1", row_number().over(w1))
      .withColumn("r2", row_number().over(w2))
      .filter(col("r1") <= k && col("r2") <= k)
      .drop("r1", "r2", "score")
  }
}
