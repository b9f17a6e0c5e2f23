package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.core.Model._

/** Brute-force joint-distribution oracle shared by the BP engine tests. */
object BruteForce {

  /** Exact marginals by enumerating all configurations. */
  def marginals(vars: Seq[VarNode], factors: Seq[FactorNode], weights: Weights,
                mask: FeatureMask): Map[Long, Array[Double]] = {
    val idx = vars.map(_.id).zipWithIndex.toMap
    val prior = vars.map(v => v.feats.map(f => dot(weights(v.family), mask(v.family), f)))
    val facPot = factors.map(f => f.feats.map(ft => dot(weights(f.family), mask(f.family), ft)))

    val domains = vars.map(_.domain).toArray
    val n = domains.product
    val scores = new Array[Double](n)
    val state = new Array[Int](domains.length)
    var c = 0
    while (c < n) {
      var rem = c
      var i = domains.length - 1
      while (i >= 0) { state(i) = rem % domains(i); rem /= domains(i); i -= 1 }
      var s = 0.0
      for (vi <- vars.indices) s += prior(vi)(state(vi))
      for (fi <- factors.indices) {
        val f = factors(fi)
        val cfgIdx = Configs.index(f.domains, f.vars.map(v => state(idx(v))))
        s += facPot(fi)(cfgIdx)
      }
      scores(c) = s
      c += 1
    }
    val mx = scores.max
    val probs = scores.map(x => math.exp(x - mx))
    val z = probs.sum

    vars.indices.map { vi =>
      val m = new Array[Double](domains(vi))
      var cc = 0
      while (cc < n) {
        var rem = cc
        var i = domains.length - 1
        var st = 0
        while (i >= 0) { val s = rem % domains(i); if (i == vi) st = s; rem /= domains(i); i -= 1 }
        m(st) += probs(cc) / z
        cc += 1
      }
      vars(vi).id -> m
    }.toMap
  }
}

class LocalBPSpec extends AnyFunSuite {

  private val w = Weights.init()
  private val mask = FeatureMask.all

  /** var with a single-feature family (U1 weights = [1.0]). */
  private def v(id: Long, f0: Double, f1: Double, gold: Int = -1): VarNode =
    VarNode(id, 2, Family.U1, Array(Array(f0), Array(f1)), Array(0L, 1L), gold)

  private def pairFactor(id: Long, v1: Long, v2: Long, table: Array[Double]): FactorNode =
    FactorNode(id, Family.U4, Array(v1, v2), Array(2, 2), table.map(Array(_)))

  test("isolated variable belief is softmax of its prior") {
    val res = LocalBP.run(Seq(v(1, 0.2, 0.8)), Nil, w, mask)
    val b = res.varBeliefs(1L)
    val expect1 = 1.0 / (1.0 + math.exp(-0.6))
    assert(math.abs(b(1) - expect1) < 1e-9)
    assert(math.abs(b.sum - 1.0) < 1e-12)
  }

  test("tree graph: BP matches brute force exactly") {
    val vars = Seq(v(1, 0.1, 0.9), v(2, 0.5, 0.5), v(3, 0.7, 0.3))
    val factors = Seq(
      pairFactor(10, 1, 2, Array(0.9, 0.1, 0.1, 0.9)), // agreement factor
      pairFactor(11, 2, 3, Array(0.8, 0.2, 0.2, 0.8)),
    )
    val res = LocalBP.run(vars, factors, w, mask, LocalBP.Config(sweeps = 50, damping = 0.2))
    val exact = BruteForce.marginals(vars, factors, w, mask)
    vars.foreach { vn =>
      val got = res.varBeliefs(vn.id); val want = exact(vn.id)
      got.zip(want).foreach { case (g, e) => assert(math.abs(g - e) < 1e-5, s"var ${vn.id}") }
    }
  }

  test("loopy triangle: BP approximates brute force") {
    val vars = Seq(v(1, 0.1, 0.9), v(2, 0.2, 0.8), v(3, 0.8, 0.2))
    val factors = Seq(
      pairFactor(10, 1, 2, Array(0.9, 0.1, 0.1, 0.9)),
      pairFactor(11, 2, 3, Array(0.9, 0.1, 0.1, 0.9)),
      pairFactor(12, 1, 3, Array(0.9, 0.1, 0.1, 0.9)),
    )
    val res = LocalBP.run(vars, factors, w, mask, LocalBP.Config(sweeps = 80, damping = 0.4))
    val exact = BruteForce.marginals(vars, factors, w, mask)
    vars.foreach { vn =>
      val got = res.varBeliefs(vn.id); val want = exact(vn.id)
      got.zip(want).foreach { case (g, e) => assert(math.abs(g - e) < 0.12, s"var ${vn.id}") }
      // the MAP state must agree on this clearly-decided instance
      assert(got.indexOf(got.max) == want.indexOf(want.max))
    }
  }

  test("ternary transitive factor matches brute force on a tree-like case") {
    val vars = Seq(v(1, 0.0, 1.2), v(2, 0.0, 1.0), v(3, 0.6, 0.4))
    val feats = (0 until 8).map { c =>
      Array(Scores.transitive((c >> 2) & 1, (c >> 1) & 1, c & 1))
    }.toArray
    val factors = Seq(FactorNode(20, Family.U1, Array(1L, 2L, 3L), Array(2, 2, 2), feats))
    val res = LocalBP.run(vars, factors, w, mask, LocalBP.Config(sweeps = 60, damping = 0.2))
    val exact = BruteForce.marginals(vars, factors, w, mask)
    vars.foreach { vn =>
      res.varBeliefs(vn.id).zip(exact(vn.id)).foreach { case (g, e) =>
        assert(math.abs(g - e) < 0.05)
      }
    }
  }

  test("transitive factor pulls the third pair up") {
    // x12 and x23 confidently 1; x13 prior is neutral -> factor should raise P(x13=1)
    val vars = Seq(v(1, 0.0, 2.0), v(2, 0.0, 2.0), v(3, 0.5, 0.5))
    val feats = (0 until 8).map { c =>
      Array(Scores.transitive((c >> 2) & 1, (c >> 1) & 1, c & 1))
    }.toArray
    val factors = Seq(FactorNode(20, Family.U1, Array(1L, 2L, 3L), Array(2, 2, 2), feats))
    val res = LocalBP.run(vars, factors, w, mask)
    assert(res.varBeliefs(3L)(1) > 0.5)
  }

  test("fact-inclusion factor favors the CKB-supported combination") {
    // linking vars with 3 states each (NIL + 2 candidates); only (1,1,1) is a fact
    def lv(id: Long, bias: Double) = VarNode(id, 3, Family.U4,
      Array(Array(0.0), Array(bias), Array(bias)), Array(-1L, 10L + id, 20L + id), -1)
    val vars = Seq(lv(1, 0.3), lv(2, 0.3), lv(3, 0.3))
    val feats = Array.tabulate(27) { c =>
      Array(Scores.inclusion(c == 13)) // config (1,1,1) = 1*9 + 1*3 + 1
    }
    val factors = Seq(FactorNode(30, Family.U4, Array(1L, 2L, 3L), Array(3, 3, 3), feats))
    val res = LocalBP.run(vars, factors, w, mask)
    vars.foreach { vn =>
      val b = res.varBeliefs(vn.id)
      assert(b(1) > b(2), s"state 1 should beat state 2 for var ${vn.id}")
    }
    val exact = BruteForce.marginals(vars, factors, w, mask)
    vars.foreach { vn =>
      res.varBeliefs(vn.id).zip(exact(vn.id)).foreach { case (g, e) =>
        assert(math.abs(g - e) < 0.05)
      }
    }
  }

  test("consistency factor couples linking equality and the pair variable") {
    // both linking vars strongly prefer the same entity; pair var neutral
    def lv(id: Long, same: Boolean) = VarNode(id, 2, Family.U4,
      Array(Array(0.0), Array(2.0)), Array(-1L, if (same) 99L else 50L + id), -1)
    val pairVar = v(3, 0.5, 0.5)
    val feats = Array.tabulate(2 * 2 * 2) { c =>
      val i = (c >> 2) & 1; val j = (c >> 1) & 1; val x = c & 1
      def st(k: Int, id: Long) = if (k == 0) -1L else id
      Array(Scores.consistency(st(i, 99L), st(j, 99L), x))
    }
    val factors = Seq(FactorNode(40, Family.U5, Array(1L, 2L, 3L), Array(2, 2, 2), feats))
    val res = LocalBP.run(Seq(lv(1, same = true), lv(2, same = true), pairVar),
      factors, w, mask)
    assert(res.varBeliefs(3L)(1) > 0.55)
  }

  test("beliefs are normalized distributions") {
    val vars = Seq(v(1, 0.3, 0.7), v(2, 0.6, 0.4))
    val factors = Seq(pairFactor(10, 1, 2, Array(0.7, 0.3, 0.3, 0.7)))
    val res = LocalBP.run(vars, factors, w, mask)
    res.varBeliefs.values.foreach { b =>
      assert(math.abs(b.sum - 1.0) < 1e-9)
      b.foreach(x => assert(x >= 0))
    }
    res.factorBeliefs.values.foreach { b =>
      assert(math.abs(b.sum - 1.0) < 1e-9)
    }
  }

  test("convergence is reported on an easy graph") {
    val res = LocalBP.run(Seq(v(1, 0.2, 0.8)), Nil, w, mask,
      LocalBP.Config(sweeps = 5, damping = 0.0, tol = 1e-6))
    assert(res.converged)
  }

  test("factor beliefs marginalize to variable beliefs on a tree") {
    val vars = Seq(v(1, 0.1, 0.9), v(2, 0.4, 0.6))
    val factors = Seq(pairFactor(10, 1, 2, Array(0.9, 0.1, 0.1, 0.9)))
    val res = LocalBP.run(vars, factors, w, mask, LocalBP.Config(sweeps = 50, damping = 0.1))
    val fb = res.factorBeliefs(10L)
    // marginalize factor belief over var 2 -> var 1 belief
    val m0 = fb(0) + fb(1); val m1 = fb(2) + fb(3)
    val vb = res.varBeliefs(1L)
    assert(math.abs(m0 - vb(0)) < 1e-5)
    assert(math.abs(m1 - vb(1)) < 1e-5)
  }

  test("masked features are ignored") {
    val mask2 = FeatureMask(FeatureMask.all.m.updated(Family.U1, Array(false)))
    val res = LocalBP.run(Seq(v(1, 0.0, 5.0)), Nil, w, mask2)
    val b = res.varBeliefs(1L)
    assert(math.abs(b(0) - 0.5) < 1e-12) // prior masked away -> uniform
  }

  test("weights scale the potentials") {
    val w2 = Weights.init().updated(Family.U1, Array(2.0))
    val res = LocalBP.run(Seq(v(1, 0.0, 1.0)), Nil, w2, mask)
    val b = res.varBeliefs(1L)
    val expect1 = 1.0 / (1.0 + math.exp(-2.0))
    assert(math.abs(b(1) - expect1) < 1e-9)
  }
}
