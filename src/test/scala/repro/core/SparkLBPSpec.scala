package repro.core

import scala.util.Random

import repro.SparkSpec
import repro.core.Model._

class SparkLBPSpec extends SparkSpec {
  import spark.implicits._

  private val w = Weights.init()
  private val mask = FeatureMask.all

  private def runBoth(vars: Seq[VarNode], factors: Seq[FactorNode],
                      sweeps: Int = 3): (Map[Long, Array[Double]], Map[Long, Array[Double]]) = {
    val local = LocalBP.run(vars, factors, w, mask,
      LocalBP.Config(sweeps = sweeps, damping = 0.3, tol = 0.0))
    val dist = SparkLBP.run(spark, vars.toDS(), factors.toDS(), w, mask,
      SparkLBP.Config(sweeps = sweeps, damping = 0.3))
      .as[(Long, Array[Double])].collect().toMap
    (local.varBeliefs, dist)
  }

  private def assertAgree(a: Map[Long, Array[Double]], b: Map[Long, Array[Double]]): Unit = {
    assert(a.keySet == b.keySet)
    a.foreach { case (id, ba) =>
      ba.zip(b(id)).foreach { case (x, y) =>
        assert(math.abs(x - y) < 1e-6, s"var $id: $x vs $y")
      }
    }
  }

  /** Random graph: binary pair vars + some linking-style vars + mixed factors. */
  private def randomGraph(seed: Long, nVars: Int, nFactors: Int): (Seq[VarNode], Seq[FactorNode]) = {
    val rng = new Random(seed)
    val vars = (0 until nVars).map { i =>
      val domain = 2 + rng.nextInt(3)
      val fam = Family.U1 // single-feature family for simplicity
      val feats = Array.fill(domain)(Array(rng.nextDouble()))
      VarNode(i.toLong, domain, fam, feats, Array.tabulate(domain)(_.toLong), -1)
    }
    val factors = (0 until nFactors).map { fi =>
      val k = 2 + rng.nextInt(2)
      val vs = rng.shuffle(vars.indices.toList).take(k).map(_.toLong).toArray
      val domains = vs.map(v => vars(v.toInt).domain)
      val nCfg = domains.product
      val fam = Seq(Family.U1, Family.U4, Family.U5)(rng.nextInt(3))
      FactorNode(1000L + fi, fam, vs, domains,
        Array.fill(nCfg)(Array(rng.nextDouble())))
    }
    (vars, factors)
  }

  test("agrees with LocalBP on an isolated variable") {
    val vars = Seq(VarNode(1, 2, Family.U1,
      Array(Array(0.2), Array(0.8)), Array(0L, 1L), -1))
    val (l, d) = runBoth(vars, Nil)
    assertAgree(l, d)
  }

  test("agrees with LocalBP on a small tree") {
    val vars = Seq(
      VarNode(1, 2, Family.U1, Array(Array(0.1), Array(0.9)), Array(0L, 1L), -1),
      VarNode(2, 2, Family.U1, Array(Array(0.6), Array(0.4)), Array(0L, 1L), -1))
    val factors = Seq(FactorNode(10, Family.U4, Array(1L, 2L), Array(2, 2),
      Array(Array(0.9), Array(0.1), Array(0.1), Array(0.9))))
    val (l, d) = runBoth(vars, factors)
    assertAgree(l, d)
  }

  test("agrees with LocalBP on a loopy triangle") {
    val vars = (1 to 3).map(i =>
      VarNode(i.toLong, 2, Family.U1,
        Array(Array(0.3), Array(0.7)), Array(0L, 1L), -1))
    val factors = Seq(
      FactorNode(10, Family.U1, Array(1L, 2L, 3L), Array(2, 2, 2),
        (0 until 8).map(c => Array(Scores.transitive((c >> 2) & 1, (c >> 1) & 1, c & 1))).toArray))
    val (l, d) = runBoth(vars, factors)
    assertAgree(l, d)
  }

  test("agrees with LocalBP on random mixed graphs") {
    for (seed <- 1 to 2) {
      val (vars, factors) = randomGraph(seed, nVars = 12, nFactors = 10)
      val (l, d) = runBoth(vars, factors, sweeps = 3)
      assertAgree(l, d)
    }
  }

  test("vars untouched by any factor keep their prior belief") {
    val vars = Seq(
      VarNode(1, 2, Family.U1, Array(Array(0.0), Array(1.0)), Array(0L, 1L), -1),
      VarNode(2, 2, Family.U1, Array(Array(0.5), Array(0.5)), Array(0L, 1L), -1))
    val factors = Seq(FactorNode(10, Family.U4, Array(2L, 2L), Array(2, 2),
      Array(Array(0.5), Array(0.5), Array(0.5), Array(0.5))))
    // factor only touches var 2 (twice — degenerate but legal for the engine)
    val (l, d) = runBoth(vars, factors)
    assertAgree(l, d)
    val expect1 = 1.0 / (1.0 + math.exp(-1.0))
    assert(math.abs(d(1L)(1) - expect1) < 1e-9)
  }

  test("respects the feature mask like LocalBP") {
    val m2 = FeatureMask(FeatureMask.all.m.updated(Family.U1, Array(false)))
    val vars = Seq(VarNode(1, 2, Family.U1,
      Array(Array(0.0), Array(3.0)), Array(0L, 1L), -1))
    val d = SparkLBP.run(spark, vars.toDS(), spark.emptyDataset[FactorNode], w, m2)
      .as[(Long, Array[Double])].collect().toMap
    assert(math.abs(d(1L)(0) - 0.5) < 1e-12)
  }
}
