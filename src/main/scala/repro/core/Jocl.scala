package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.Model._
import repro.synth.{CkbDf, OkbDf}

/** End-to-end JOCL pipeline: graph construction -> (optional) weight
  * learning on the validation split -> LBP inference -> joint decoding.
  *
  * The `variant` in the graph config realizes Table 4's ablations
  * (JOCL_cano / JOCL_link) and the `mask` realizes Table 5's feature
  * combinations (JOCL-single / -double / -all).
  */
object Jocl {

  final case class Config(
      graph: GraphBuilder.Config = GraphBuilder.Config(),
      learning: Learning.Config = Learning.Config(),
      sparkBp: SparkLBP.Config = SparkLBP.Config(),
      localBp: LocalBP.Config = LocalBP.Config(),
      mask: FeatureMask = FeatureMask.all,
      /** "spark" = distributed LBP (the deliverable); "local" = reference engine. */
      engine: String = "spark",
  )

  final case class Result(slots: Map[String, Inference.SlotResult], weights: Weights)

  /** Learn weights on a (fully labeled) validation OKB with the local
    * reference engine (see [[Learning]]).
    */
  def learnWeights(spark: SparkSession, valOkb: OkbDf, ckb: CkbDf,
                   side: GraphBuilder.SideInfo, cfg: Config = Config()): Weights = {
    val g = GraphBuilder.build(spark, valOkb, ckb, side, cfg.graph)
    val vars = g.vars.collect().toSeq
    val factors = g.factors.collect().toSeq
    Learning.learn(vars, factors, Weights.init(), cfg.mask, cfg.learning)
  }

  /** Run inference over an OKB with the given weights. */
  def infer(spark: SparkSession, okb: OkbDf, ckb: CkbDf, side: GraphBuilder.SideInfo,
            weights: Weights, cfg: Config = Config()): Result = {
    import spark.implicits._
    val g = GraphBuilder.build(spark, okb, ckb, side, cfg.graph)
    val beliefs: DataFrame = cfg.engine match {
      case "spark" =>
        SparkLBP.run(spark, g.vars, g.factors, weights, cfg.mask, cfg.sparkBp)
      case "local" =>
        val res = LocalBP.run(g.vars.collect().toSeq, g.factors.collect().toSeq,
          weights, cfg.mask, cfg.localBp)
        res.varBeliefs.toSeq.map { case (id, b) => (id, b) }.toDF("var_id", "belief")
      case other => throw new IllegalArgumentException(s"unknown engine: $other")
    }
    Result(Inference.decode(spark, okb, g, beliefs), weights)
  }

  /** Convenience: learn on the validation OKB, then infer on the test OKB. */
  def run(spark: SparkSession, valOkb: OkbDf, testOkb: OkbDf, ckb: CkbDf,
          side: GraphBuilder.SideInfo, cfg: Config = Config()): Result = {
    val w = learnWeights(spark, valOkb, ckb, side, cfg)
    infer(spark, testOkb, ckb, side, w, cfg)
  }
}
