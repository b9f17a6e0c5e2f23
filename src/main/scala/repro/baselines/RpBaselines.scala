package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.cluster.ConnectedComponents
import repro.mining.Amie
import repro.text.StringSim

/** Helpers shared by the rule-graph RP baselines: turn an equivalence edge
  * list over phrases into a clustering via Spark connected components.
  */
object RuleGraphUtil {

  /** @param rps   single-column distinct phrase set
    * @param edges columns `rp1`, `rp2`
    */
  def componentsOf(spark: SparkSession, rps: DataFrame, edges: DataFrame): DataFrame = {
    import spark.implicits._
    val texts = rps.select(col(rps.columns.head).as("text")).distinct()
    val w = Window.orderBy("text")
    val ids = texts.withColumn("id", row_number().over(w).cast("long")).cache()
    val e = edges
      .join(ids.select(col("text").as("rp1"), col("id").as("src")), Seq("rp1"))
      .join(ids.select(col("text").as("rp2"), col("id").as("dst")), Seq("rp2"))
      .select("src", "dst")
    val cc = ConnectedComponents.run(spark, ids.select("id"), e)
    ids.join(cc, "id")
      .select(col("text"), concat(lit("c"), col("component")).as("cluster"))
  }
}

/** AMIE baseline (Galárraga et al. 2013, Table 2): components of the
  * bidirectional implication-rule graph mined over the OKB.
  */
object AmieBaseline {
  def cluster(spark: SparkSession, triples: DataFrame, rps: DataFrame,
              cfg: Amie.Config = Amie.Config()): DataFrame = {
    val edges = Amie.equivalentRawPairs(triples, rps, cfg)
    RuleGraphUtil.componentsOf(spark, rps, edges)
  }
}

/** PATTY stand-in (Nakashole et al. 2012, Table 2): RPs in the same synset
  * (our paraphrase dictionary plays the synset taxonomy) or supported by
  * the same NP pairs (>= 2 shared normalized subject-object pairs) are
  * grouped together.
  */
object Patty {

  def cluster(spark: SparkSession, triples: DataFrame, rps: DataFrame,
              synsets: Map[String, Long], minSharedPairs: Int = 2): DataFrame = {
    // PATTY's pattern dictionary is lemmatized: look synsets up through the
    // morphologically normalized RP, so tense/modifier variants hit.
    val normSynsets = synsets.map { case (k, v) => StringSim.morphNormalize(k) -> v }
    val syn = udf((s: String) =>
      normSynsets.get(StringSim.morphNormalize(s)).map(_.toString).orNull)
    val texts = rps.select(col(rps.columns.head).as("text")).distinct()
    val synEdges = texts.as("a")
      .join(texts.as("b"),
        syn(col("a.text")).isNotNull && syn(col("a.text")) === syn(col("b.text")) &&
          col("a.text") < col("b.text"))
      .select(col("a.text").as("rp1"), col("b.text").as("rp2"))

    // same-NP-pair support on RAW surface forms: normalizing the NPs here
    // would conflate colliding aliases of different entities and chain
    // unrelated RPs into one component
    val facts = triples.select(col("subj").as("ns"), col("pred"), col("obj").as("no"))
      .distinct()
    val shared = facts.as("a")
      .join(facts.as("b"),
        col("a.ns") === col("b.ns") && col("a.no") === col("b.no") &&
          col("a.pred") < col("b.pred"))
      .groupBy(col("a.pred").as("rp1"), col("b.pred").as("rp2"))
      .agg(count(lit(1)).as("n"))
      .filter(col("n") >= minSharedPairs)
      .select("rp1", "rp2")

    RuleGraphUtil.componentsOf(spark, rps, synEdges.union(shared).distinct())
  }
}
