package repro.core

import repro.core.Model._

/** Weight learning for the JOCL factor graph (paper §3.4).
  *
  * Maximizes the log-likelihood of the labeled configuration with gradient
  * ascent; the gradient of each weight is E_{p(Y|Y^L)}[Q] − E_{p(Y)}[Q]
  * (Eq. 6). The validation split is fully labeled, so the clamped
  * expectation is the feature value at the gold configuration, and the free
  * expectation comes from LBP beliefs. Runs on the local reference engine —
  * the validation graph is small, and 20 epochs x several BP sweeps as
  * Spark rounds would be latency- not throughput-bound (the paper itself
  * notes distributed learning as an optional extension).
  */
object Learning {

  final case class Config(
      lr: Double = 0.05, // paper's learning rate
      /** the paper reports BP convergence within twenty iterations; the
        * per-family-normalized gradient needs a few more epochs to move the
        * consistency weights past the string-similarity priors.
        */
      epochs: Int = 40,
      bp: LocalBP.Config = LocalBP.Config(sweeps = 8, damping = 0.3),
      l2: Double = 1e-3,
      maxAbsWeight: Double = 8.0,
  )

  /** Gradient-ascent training; variables with gold = -1 are skipped in the
    * clamped term (their factors contribute only to the free expectation).
    */
  def learn(vars: Seq[VarNode], factors: Seq[FactorNode],
            init: Weights, mask: FeatureMask, cfg: Config = Config()): Weights = {
    val varArr = vars.toArray
    val goldOf = varArr.iterator.map(v => v.id -> v.gold).toMap
    var weights = init

    var epoch = 0
    while (epoch < cfg.epochs) {
      val bp = LocalBP.run(varArr, factors, weights, mask, cfg.bp)

      // accumulate gradient and counts per family
      val grad = Family.features.map { case (f, names) => f -> new Array[Double](names.size) }
      val cnt = scala.collection.mutable.Map[String, Long]().withDefaultValue(0L)

      varArr.foreach { v =>
        if (v.gold >= 0) {
          val g = grad(v.family)
          val b = bp.varBeliefs(v.id)
          var s = 0
          while (s < v.domain) {
            val coef = (if (s == v.gold) 1.0 else 0.0) - b(s)
            var i = 0
            while (i < g.length) { g(i) += coef * v.feats(s)(i); i += 1 }
            s += 1
          }
          cnt(v.family) += 1
        }
      }

      factors.foreach { f =>
        val golds = f.vars.map(goldOf)
        if (golds.forall(_ >= 0)) {
          val goldCfg = Configs.index(f.domains, golds)
          val g = grad(f.family)
          val b = bp.factorBeliefs(f.id)
          var c = 0
          while (c < f.feats.length) {
            val coef = (if (c == goldCfg) 1.0 else 0.0) - b(c)
            var i = 0
            while (i < g.length) { g(i) += coef * f.feats(c)(i); i += 1 }
            c += 1
          }
          cnt(f.family) += 1
        }
      }

      weights = Weights(weights.w.map { case (fam, w) =>
        val n = math.max(1L, cnt(fam)).toDouble
        val g = grad(fam)
        val m = mask(fam)
        val updated = Array.tabulate(w.length) { i =>
          // masked features are absent from the potentials: no gradient
          val step = if (m(i)) g(i) / n else 0.0
          val nw = w(i) + cfg.lr * (step - cfg.l2 * w(i))
          math.max(-cfg.maxAbsWeight, math.min(cfg.maxAbsWeight, nw))
        }
        fam -> updated
      })
      epoch += 1
    }
    weights
  }
}
