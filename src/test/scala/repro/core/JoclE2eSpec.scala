package repro.core

import repro.SparkSpec
import repro.core.Model.FeatureMask
import repro.harness.Tables
import repro.synth.{OkbGen, WorldConfig}

/** End-to-end pipeline tests: learning on the validation split, inference,
  * decoding, scoring.
  */
class JoclE2eSpec extends SparkSpec {

  private def envOf(cfg: WorldConfig): Tables.Env = Tables.env(spark, cfg)

  private lazy val cleanEnv = envOf(WorldConfig.clean(nEntities = 24, nRelations = 5,
    nTriples = 150, seed = 3L))

  private lazy val cleanRun = {
    val cfg = Tables.joclConfig(engine = "local")
    val w = Jocl.learnWeights(spark, cleanEnv.valOkb, cleanEnv.ckb, cleanEnv.side, cfg)
    Jocl.infer(spark, cleanEnv.testOkb, cleanEnv.ckb, cleanEnv.side, w, cfg)
  }

  test("clean world: NP canonicalization is near-perfect") {
    val s = Tables.scoreClusters(cleanRun.slots("subj").clusters,
      cleanEnv.testOkb.goldSubj, "np")
    assert(s.avgF1 > 0.9, s"clean-world subject canonicalization: $s")
  }

  test("clean world: RP canonicalization is near-perfect") {
    val s = Tables.scoreClusters(cleanRun.slots("pred").clusters,
      cleanEnv.testOkb.goldPred, "rp")
    assert(s.avgF1 > 0.9, s"clean-world RP canonicalization: $s")
  }

  test("clean world: entity linking is near-perfect") {
    val acc = Tables.scoreJoclNpLinking(cleanRun, cleanEnv)
    assert(acc > 0.9, s"clean-world linking accuracy $acc")
  }

  test("learned weights are positive for the informative families") {
    val w = cleanRun.weights
    assert(w(Model.Family.F4)(0) > 0, "popularity weight should stay positive")
    assert(w(Model.Family.F1)(0) > 0, "idf weight should stay positive")
  }

  test("noisy world: full JOCL beats the canonicalization-only ablation") {
    val env = envOf(WorldConfig.reverb45kLite(0.1))
    val full = Tables.joclRun(spark, env, env, "full-all",
      Tables.joclConfig(engine = "local"))
    val cano = Tables.joclRun(spark, env, env, "cano-all",
      Tables.joclConfig(variant = GraphBuilder.CanoOnly, engine = "local"))
    val sFull = Tables.scoreClusters(full.slots("subj").clusters, env.testOkb.goldSubj, "np")
    val sCano = Tables.scoreClusters(cano.slots("subj").clusters, env.testOkb.goldSubj, "np")
    assert(sFull.avgF1 >= sCano.avgF1 - 0.02,
      s"joint ${sFull.avgF1} vs cano-only ${sCano.avgF1}")
  }

  test("noisy world: full JOCL beats the linking-only ablation") {
    val env = envOf(WorldConfig.reverb45kLite(0.1))
    val full = Tables.joclRun(spark, env, env, "full-all",
      Tables.joclConfig(engine = "local"))
    val link = Tables.joclRun(spark, env, env, "link-all",
      Tables.joclConfig(variant = GraphBuilder.LinkOnly, engine = "local"))
    val aFull = Tables.scoreJoclNpLinking(full, env)
    val aLink = Tables.scoreJoclNpLinking(link, env)
    assert(aFull >= aLink - 0.02, s"joint $aFull vs link-only $aLink")
  }

  test("feature variants run and -all is not worse than -single") {
    val env = envOf(WorldConfig.reverb45kLite(0.1))
    val all = Tables.joclRun(spark, env, env, "full-all",
      Tables.joclConfig(engine = "local"))
    val single = Tables.joclRun(spark, env, env, "full-single",
      Tables.joclConfig(mask = FeatureMask.single, engine = "local"))
    val aAll = Tables.scoreJoclNpLinking(all, env)
    val aSingle = Tables.scoreJoclNpLinking(single, env)
    assert(aAll >= aSingle - 0.05, s"all $aAll vs single $aSingle")
  }

  test("spark and local engines give the same decoded result") {
    val env = envOf(WorldConfig.clean(nEntities = 16, nRelations = 4,
      nTriples = 80, seed = 9L))
    val cfgL = Tables.joclConfig(engine = "local")
      .copy(localBp = LocalBP.Config(sweeps = 5, damping = 0.3, tol = 0.0))
    val w = Jocl.learnWeights(spark, env.valOkb, env.ckb, env.side, cfgL)
    val local = Jocl.infer(spark, env.testOkb, env.ckb, env.side, w, cfgL)
    val sparkRes = Jocl.infer(spark, env.testOkb, env.ckb, env.side, w,
      cfgL.copy(engine = "spark",
        sparkBp = SparkLBP.Config(sweeps = 5, damping = 0.3)))
    import spark.implicits._
    def linksOf(r: Jocl.Result) =
      r.slots("subj").links.as[(String, Option[Long])].collect().toMap
    assert(linksOf(local) == linksOf(sparkRes))
  }
}
