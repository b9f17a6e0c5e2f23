package repro.harness

import scala.collection.mutable

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.baselines._
import repro.core.{GraphBuilder, Jocl}
import repro.core.Model.{FeatureMask, Weights}
import repro.eval.Metrics
import repro.eval.Metrics.ClusterScores
import repro.synth.{CkbDf, OkbDf, OkbGen, World, WorldConfig}

/** The experiment harness behind every table of the paper. Jobs
  * (`jobs/TableNJob.scala`) and benches (`bench/.../TableNBench.scala`)
  * both call into here; expensive artifacts (worlds, learned weights, JOCL
  * runs) are memoized per JVM so the table suites can share them.
  */
object Tables {

  /** One prepared data set: the world plus its CKB/OKB DataFrames. */
  final case class Env(world: World, ckb: CkbDf, side: GraphBuilder.SideInfo,
                       valOkb: OkbDf, testOkb: OkbDf) {
    def subjects(spark: SparkSession): DataFrame =
      testOkb.triples.select(col("subj").as("phrase")).distinct()
    def preds(spark: SparkSession): DataFrame =
      testOkb.triples.select(col("pred").as("phrase")).distinct()
    def allNps(spark: SparkSession): DataFrame =
      testOkb.triples.select(col("subj").as("phrase"))
        .union(testOkb.triples.select(col("obj").as("phrase"))).distinct()
  }

  private val envCache = mutable.Map[String, Env]()
  private val weightsCache = mutable.Map[String, Weights]()
  private val runCache = mutable.Map[String, Jocl.Result]()

  def env(spark: SparkSession, cfg: WorldConfig): Env = synchronized {
    envCache.getOrElseUpdate(s"${cfg.name}-${cfg.nOkbTriples}-${cfg.seed}", {
      val world = OkbGen.generate(cfg)
      Env(world, world.ckbDf(spark),
        GraphBuilder.SideInfo(world.ppdb, world.kbp),
        world.okbDf(spark, world.validationTriples),
        world.okbDf(spark, world.testTriples))
    })
  }

  /** JOCL config used across the tables; engine "spark" by default. */
  def joclConfig(variant: GraphBuilder.Variant = GraphBuilder.Full,
                 mask: FeatureMask = FeatureMask.all,
                 engine: String = "spark"): Jocl.Config =
    Jocl.Config(graph = GraphBuilder.Config(variant = variant), mask = mask,
      engine = engine)

  /** Learn weights for a variant/mask on the ReVerb-lite validation split
    * (the paper trains all parameters there, also for NYTimes2018).
    */
  private def envKey(e: Env): String =
    s"${e.world.cfg.name}-${e.world.cfg.nOkbTriples}-${e.world.cfg.seed}"

  def weights(spark: SparkSession, trainEnv: Env, key: String,
              cfg: Jocl.Config): Weights = synchronized {
    weightsCache.getOrElseUpdate(s"${envKey(trainEnv)}-$key", {
      Jocl.learnWeights(spark, trainEnv.valOkb, trainEnv.ckb, trainEnv.side, cfg)
    })
  }

  /** Run JOCL (memoized per dataset+variant+mask+engine). */
  def joclRun(spark: SparkSession, trainEnv: Env, testEnv: Env, key: String,
              cfg: Jocl.Config): Jocl.Result = synchronized {
    runCache.getOrElseUpdate(s"${envKey(testEnv)}-$key-${cfg.engine}", {
      val w = weights(spark, trainEnv, key, cfg)
      Jocl.infer(spark, testEnv.testOkb, testEnv.ckb, testEnv.side, w, cfg)
    })
  }

  // ---- scoring helpers ----------------------------------------------------

  /** Score a clustering (`text`, `cluster`) against a gold table. */
  def scoreClusters(clusters: DataFrame, gold: DataFrame, goldTextCol: String): ClusterScores =
    Metrics.clusterScores(
      gold.select(col(goldTextCol).as("element"), col("gold_id").as("gold_cluster"))
        .join(clusters.select(col("text").as("element"), col("cluster").as("pred_cluster")),
          Seq("element"), "left")
        .withColumn("pred_cluster",
          coalesce(col("pred_cluster"), concat(lit("solo:"), col("element")))))

  /** Accuracy of a per-text linking result against (slot-wise) gold NPs. */
  def scoreNpLinking(links: DataFrame, env: Env): Double = {
    val gold = env.testOkb.goldSubj.select(lit("subj").as("slot"), col("np"), col("gold_id"))
      .union(env.testOkb.goldObj.select(lit("obj").as("slot"), col("np"), col("gold_id")))
    Metrics.linkingAccuracy(
      gold.join(links.withColumnRenamed("text", "np"), Seq("np"), "left"))
  }

  /** Accuracy of JOCL's slot-aware linking result. */
  def scoreJoclNpLinking(res: Jocl.Result, env: Env): Double = {
    val subj = env.testOkb.goldSubj
      .join(res.slots("subj").links.withColumnRenamed("text", "np"), Seq("np"), "left")
    val obj = env.testOkb.goldObj
      .join(res.slots("obj").links.withColumnRenamed("text", "np"), Seq("np"), "left")
    Metrics.linkingAccuracy(subj.unionByName(obj))
  }

  // ---- Table 1: NP canonicalization ---------------------------------------

  final case class CanonRow(method: String, dataset: String, scores: ClusterScores)

  def table1(spark: SparkSession, reverb: Env, others: Seq[Env],
             engine: String = "spark"): Seq[CanonRow] = {
    val datasets = reverb +: others
    datasets.flatMap { e =>
      val ds = e.world.cfg.name
      val subj = e.subjects(spark)
      val nps = e.allNps(spark)
      val gold = e.testOkb.goldSubj
      def row(m: String, clusters: DataFrame) =
        CanonRow(m, ds, scoreClusters(clusters, gold, "np"))

      val jocl = joclRun(spark, reverb, e, "full-all", joclConfig(engine = engine))
      Seq(
        row("Morph Norm", MorphNorm.cluster(spark, subj)),
        row("Wikidata Integrator", WikidataIntegrator.cluster(spark, subj, e.ckb)),
        row("Text Similarity", TextSimilarity.cluster(spark, subj, nps)),
        row("IDF Token Overlap", IdfTokenOverlap.cluster(spark, subj, nps)),
        row("Attribute Overlap", AttributeOverlap.cluster(spark, e.testOkb.triples)),
        row("CESI", Cesi.cluster(spark, subj, nps, e.world.ppdb)),
        row("SIST", Sist.cluster(spark, subj, nps, e.ckb, e.world.ppdb)),
        row("JOCL", jocl.slots("subj").clusters),
      )
    }
  }

  // ---- Table 2: RP canonicalization (ReVerb-lite) --------------------------

  def table2(spark: SparkSession, reverb: Env, engine: String = "spark"): Seq[CanonRow] = {
    val rps = reverb.preds(spark)
    val gold = reverb.testOkb.goldPred
    val triples = reverb.testOkb.triples
    def row(m: String, clusters: DataFrame) =
      CanonRow(m, reverb.world.cfg.name, scoreClusters(clusters, gold, "rp"))
    val jocl = joclRun(spark, reverb, reverb, "full-all", joclConfig(engine = engine))
    // PATTY's taxonomy covers relational patterns only: restrict the
    // paraphrase dictionary to the relation synset groups
    val relSynsets = reverb.world.ppdb.filter { case (_, g) => g >= 1000000L }
    Seq(
      row("AMIE", AmieBaseline.cluster(spark, triples, rps.withColumnRenamed("phrase", "rp"))),
      row("PATTY", Patty.cluster(spark, triples, rps, relSynsets)),
      row("SIST", Sist.clusterRp(spark, rps, reverb.ckb, reverb.world.ppdb)),
      row("JOCL", jocl.slots("pred").clusters),
    )
  }

  // ---- Table 3: OKB entity linking -----------------------------------------

  final case class LinkRow(method: String, dataset: String, accuracy: Double)

  def table3(spark: SparkSession, reverb: Env, others: Seq[Env],
             engine: String = "spark"): Seq[LinkRow] = {
    val datasets = reverb +: others
    datasets.flatMap { e =>
      val ds = e.world.cfg.name
      val nps = e.allNps(spark)
      val triples = e.testOkb.triples
      def row(m: String, links: DataFrame) = LinkRow(m, ds, scoreNpLinking(links, e))
      val jocl = joclRun(spark, reverb, e, "full-all", joclConfig(engine = engine))
      Seq(
        row("Falcon", Falcon.link(spark, nps, e.ckb)),
        row("EARL", Earl.link(spark, triples, e.ckb)),
        row("Spotlight", Spotlight.link(spark, nps, e.ckb)),
        row("Tagme", Tagme.link(spark, triples, e.ckb)),
        row("KBPearl", KbPearl.link(spark, triples, e.ckb)),
        LinkRow("JOCL", ds, scoreJoclNpLinking(jocl, e)),
      )
    }
  }

  // ---- Table 4: ablation (interaction between the two tasks) ---------------

  final case class AblationRow(variant: String, scores: Option[ClusterScores],
                               accuracy: Option[Double])

  def table4(spark: SparkSession, reverb: Env, engine: String = "spark"): Seq[AblationRow] = {
    val gold = reverb.testOkb.goldSubj
    val cano = joclRun(spark, reverb, reverb, "cano-all",
      joclConfig(variant = GraphBuilder.CanoOnly, engine = engine))
    val link = joclRun(spark, reverb, reverb, "link-all",
      joclConfig(variant = GraphBuilder.LinkOnly, engine = engine))
    val full = joclRun(spark, reverb, reverb, "full-all", joclConfig(engine = engine))
    Seq(
      AblationRow("JOCL_cano",
        Some(scoreClusters(cano.slots("subj").clusters, gold, "np")), None),
      AblationRow("JOCL_link", None, Some(scoreJoclNpLinking(link, reverb))),
      AblationRow("JOCL",
        Some(scoreClusters(full.slots("subj").clusters, gold, "np")),
        Some(scoreJoclNpLinking(full, reverb))),
    )
  }

  // ---- Table 5 (+ Figure 4 numbers): feature combinations ------------------

  final case class FeatureRow(variant: String, canonScores: ClusterScores, accuracy: Double)

  def table5(spark: SparkSession, reverb: Env, engine: String = "spark"): Seq[FeatureRow] = {
    val gold = reverb.testOkb.goldSubj
    def one(name: String, key: String, mask: FeatureMask): FeatureRow = {
      val res = joclRun(spark, reverb, reverb, key, joclConfig(mask = mask, engine = engine))
      FeatureRow(name,
        scoreClusters(res.slots("subj").clusters, gold, "np"),
        scoreJoclNpLinking(res, reverb))
    }
    Seq(
      one("JOCL-single", "full-single", FeatureMask.single),
      one("JOCL-double", "full-double", FeatureMask.double),
      one("JOCL-all", "full-all", FeatureMask.all),
    )
  }

  // ---- rendering ------------------------------------------------------------

  def renderCanon(title: String, rows: Seq[CanonRow]): String = {
    val sb = new StringBuilder
    sb.append(s"== $title ==\n")
    sb.append(f"${"method"}%-22s ${"dataset"}%-18s ${"macroF1"}%8s ${"microF1"}%8s ${"pairF1"}%8s ${"avgF1"}%8s\n")
    rows.foreach { r =>
      sb.append(f"${r.method}%-22s ${r.dataset}%-18s ${r.scores.macroF1}%8.3f " +
        f"${r.scores.microF1}%8.3f ${r.scores.pairF1}%8.3f ${r.scores.avgF1}%8.3f\n")
    }
    sb.toString
  }

  def renderLinks(title: String, rows: Seq[LinkRow]): String = {
    val sb = new StringBuilder
    sb.append(s"== $title ==\n")
    sb.append(f"${"method"}%-22s ${"dataset"}%-18s ${"accuracy"}%8s\n")
    rows.foreach(r => sb.append(f"${r.method}%-22s ${r.dataset}%-18s ${r.accuracy}%8.3f\n"))
    sb.toString
  }

  def renderAblation(rows: Seq[AblationRow]): String = {
    val sb = new StringBuilder
    sb.append("== Table 4: JOCL working separately for each task (reverb45k-lite) ==\n")
    sb.append(f"${"variant"}%-12s ${"macroF1"}%8s ${"microF1"}%8s ${"pairF1"}%8s ${"avgF1"}%8s ${"accuracy"}%9s\n")
    rows.foreach { r =>
      def s(v: Option[Double]) = v.map(x => f"$x%8.3f").getOrElse("       -")
      sb.append(f"${r.variant}%-12s ${s(r.scores.map(_.macroF1))} ${s(r.scores.map(_.microF1))} " +
        f"${s(r.scores.map(_.pairF1))} ${s(r.scores.map(_.avgF1))} ${s(r.accuracy)}%9s\n")
    }
    sb.toString
  }

  def renderFeatures(rows: Seq[FeatureRow]): String = {
    val sb = new StringBuilder
    sb.append("== Table 5 / Figure 4: feature-combination variants (reverb45k-lite) ==\n")
    sb.append(f"${"variant"}%-14s ${"canon avgF1"}%12s ${"link accuracy"}%14s\n")
    rows.foreach(r =>
      sb.append(f"${r.variant}%-14s ${r.canonScores.avgF1}%12.3f ${r.accuracy}%14.3f\n"))
    sb.toString
  }
}
