package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.harness.Tables
import repro.synth.{OkbGen, WorldConfig}

class CanonBaselinesSpec extends SparkSpec {
  import spark.implicits._

  private lazy val world = OkbGen.generate(WorldConfig.reverb45kLite(0.08))
  private lazy val okb = world.okbDf(spark)
  private lazy val ckb = world.ckbDf(spark)
  private lazy val subjects = okb.triples.select(col("subj").as("phrase")).distinct()
  private lazy val allNps = okb.triples.select(col("subj").as("phrase"))
    .union(okb.triples.select(col("obj").as("phrase"))).distinct()

  private def covers(clusters: DataFrame, phrases: DataFrame): Unit = {
    val missing = phrases.select(col(phrases.columns.head).as("text"))
      .except(clusters.select("text"))
    assert(missing.count() == 0, "every element must be assigned a cluster")
  }

  test("MorphNorm covers all phrases") {
    covers(MorphNorm.cluster(spark, subjects), subjects)
  }

  test("MorphNorm groups typo variants with their canonical form") {
    // the stem of "w800x" is "w800" — they normalize identically
    val c = MorphNorm.cluster(spark, Seq("w0 w800", "w0 w800x").toDF("phrase"))
      .as[(String, String)].collect().toMap
    assert(c("w0 w800") == c("w0 w800x"))
  }

  test("MorphNorm separates different distinguishing words") {
    val c = MorphNorm.cluster(spark, Seq("w0 w800", "w0 w808").toDF("phrase"))
      .as[(String, String)].collect().toMap
    assert(c("w0 w800") != c("w0 w808"))
  }

  test("WikidataIntegrator covers all phrases") {
    covers(WikidataIntegrator.cluster(spark, subjects, ckb), subjects)
  }

  test("TextSimilarity covers all phrases") {
    covers(TextSimilarity.cluster(spark, subjects, allNps), subjects)
  }

  test("IdfTokenOverlap covers all phrases") {
    covers(IdfTokenOverlap.cluster(spark, subjects, allNps), subjects)
  }

  test("AttributeOverlap covers all subject NPs") {
    covers(AttributeOverlap.cluster(spark, okb.triples),
      okb.triples.select(col("subj")))
  }

  test("CESI covers all phrases") {
    covers(Cesi.cluster(spark, subjects, allNps, world.ppdb), subjects)
  }

  test("SIST covers all phrases") {
    covers(Sist.cluster(spark, subjects, allNps, ckb, world.ppdb), subjects)
  }

  test("IdfTokenOverlap merges canonical and drop aliases") {
    // drop alias shares the rare distinguishing word with the canonical name
    val ph = Seq("w0 w800", "w800", "w0 w808", "w0 w816", "w0 w824").toDF("phrase")
    val c = IdfTokenOverlap.cluster(spark, ph, ph)
      .as[(String, String)].collect().toMap
    assert(c("w0 w800") == c("w800"))
    assert(c("w0 w800") != c("w0 w808"))
  }

  test("CESI merges synonym-swap aliases that IDF misses") {
    // w800/w801 synonyms share no token: IDF fails, embeddings catch it
    val ph = Seq("w0 w800", "w0 w801", "w0 w808", "w0 w816").toDF("phrase")
    val idf = IdfTokenOverlap.cluster(spark, ph, ph).as[(String, String)].collect().toMap
    val cesi = Cesi.cluster(spark, ph, ph, Map.empty).as[(String, String)].collect().toMap
    assert(idf("w0 w800") != idf("w0 w801"))
    assert(cesi("w0 w800") == cesi("w0 w801"))
  }

  test("baselines order on the noisy preset: SIST >= MorphNorm on avg F1") {
    val gold = okb.goldSubj
    val sMorph = Tables.scoreClusters(MorphNorm.cluster(spark, subjects), gold, "np")
    val sSist = Tables.scoreClusters(
      Sist.cluster(spark, subjects, allNps, ckb, world.ppdb), gold, "np")
    assert(sSist.avgF1 >= sMorph.avgF1 - 0.02,
      s"SIST ${sSist.avgF1} vs MorphNorm ${sMorph.avgF1}")
  }

  test("AMIE baseline covers all RPs") {
    val rps = okb.triples.select(col("pred").as("rp")).distinct()
    covers(AmieBaseline.cluster(spark, okb.triples, rps), rps)
  }

  test("PATTY covers all RPs") {
    val rps = okb.triples.select(col("pred").as("rp")).distinct()
    covers(Patty.cluster(spark, okb.triples, rps, world.ppdb), rps)
  }

  test("SIST RP mode covers all RPs") {
    val rps = okb.triples.select(col("pred").as("rp")).distinct()
    covers(Sist.clusterRp(spark, rps, ckb, world.ppdb), rps)
  }

  test("PATTY groups synset members together") {
    val rps = Seq("be w80000 of", "w80000", "be w80008 of").toDF("rp")
    val synsets = Map("be w80000 of" -> 1L, "w80000" -> 1L)
    val t = Seq((1L, "a", "be w80000 of", "b")).toDF("triple_id", "subj", "pred", "obj")
    val c = Patty.cluster(spark, t, rps, synsets).as[(String, String)].collect().toMap
    assert(c("be w80000 of") == c("w80000"))
    assert(c("be w80000 of") != c("be w80008 of"))
  }
}
