package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.core.Model._

class LearningSpec extends AnyFunSuite {

  /** F1-family binary pair variables (3 features: idf, emb, ppdb). */
  private def pairVar(id: Long, sims: Array[Double], gold: Int): VarNode =
    VarNode(id, 2, Family.F1,
      Array(sims.map(1.0 - _), sims), Array(0L, 1L), gold)

  test("learning upweights the informative feature") {
    // feature 0 correlates with gold; feature 1 anti-correlates; f2 neutral
    val rng = new scala.util.Random(3)
    val vars = (0 until 60).map { i =>
      val gold = i % 2
      val f0 = if (gold == 1) 0.8 + rng.nextDouble() * 0.2 else rng.nextDouble() * 0.2
      val f1 = if (gold == 1) rng.nextDouble() * 0.2 else 0.8 + rng.nextDouble() * 0.2
      pairVar(i.toLong, Array(f0, f1, 0.5), gold)
    }
    val learned = Learning.learn(vars, Nil, Weights.init(), FeatureMask.all,
      Learning.Config(epochs = 25))
    val w = learned(Family.F1)
    assert(w(0) > w(1), s"expected w_idf > w_emb, got ${w.toVector}")
    assert(w(0) > 1.0, s"informative weight should grow, got ${w.toVector}")
  }

  test("learned weights improve gold-state belief") {
    val rng = new scala.util.Random(5)
    val vars = (0 until 40).map { i =>
      val gold = i % 2
      val f0 = if (gold == 1) 0.9 else 0.1
      pairVar(i.toLong, Array(f0, rng.nextDouble(), rng.nextDouble()), gold)
    }
    def goldProb(weights: Weights): Double = {
      val bp = LocalBP.run(vars, Nil, weights, FeatureMask.all)
      vars.map(v => bp.varBeliefs(v.id)(v.gold)).sum / vars.size
    }
    val before = goldProb(Weights.init())
    val learned = Learning.learn(vars, Nil, Weights.init(), FeatureMask.all,
      Learning.Config(epochs = 30))
    val after = goldProb(learned)
    assert(after > before, s"gold belief should improve: $before -> $after")
  }

  test("variables without gold are skipped (no crash, no drift)") {
    val vars = Seq(pairVar(1, Array(0.9, 0.1, 0.5), -1))
    val learned = Learning.learn(vars, Nil, Weights.init(), FeatureMask.all,
      Learning.Config(epochs = 5))
    // gradient contribution is zero except L2 shrink
    assert(learned(Family.F1).forall(w => w <= 1.0 && w > 0.9))
  }

  test("factor weights respond to gold configurations") {
    // transitive factors whose gold configs always satisfy transitivity
    val vars = Seq(
      pairVar(1, Array(0.6, 0.5, 0.5), 1),
      pairVar(2, Array(0.6, 0.5, 0.5), 1),
      pairVar(3, Array(0.4, 0.5, 0.5), 1), // gold 1 though prior leans 0
    )
    val feats = (0 until 8).map { c =>
      Array(Scores.transitive((c >> 2) & 1, (c >> 1) & 1, c & 1))
    }.toArray
    val factors = Seq(FactorNode(10, Family.U1, Array(1L, 2L, 3L), Array(2, 2, 2), feats))
    val learned = Learning.learn(vars, factors, Weights.init(), FeatureMask.all,
      Learning.Config(epochs = 30))
    assert(learned(Family.U1)(0) > 1.0,
      s"transitive weight should grow: ${learned(Family.U1).toVector}")
  }

  test("weights stay within the clamp") {
    val vars = (0 until 20).map(i => pairVar(i.toLong, Array(1.0, 0.0, 0.0), 1))
    val cfg = Learning.Config(epochs = 50, lr = 5.0, maxAbsWeight = 2.0)
    val learned = Learning.learn(vars, Nil, Weights.init(), FeatureMask.all, cfg)
    learned.w.values.foreach(_.foreach(x => assert(math.abs(x) <= 2.0)))
  }

  test("masked features do not learn") {
    val vars = (0 until 30).map { i =>
      val gold = i % 2
      pairVar(i.toLong, Array(if (gold == 1) 0.9 else 0.1, 0.5, 0.5), gold)
    }
    val learned = Learning.learn(vars, Nil, Weights.init(), FeatureMask.single,
      Learning.Config(epochs = 10))
    // emb and ppdb are masked in FeatureMask.single for F1: gradient flows
    // only through idf... masked weights only shrink via L2
    assert(learned(Family.F1)(0) > 1.0)
  }
}
