package repro.core

import repro.core.Model._

/** Reference loopy-BP engine (sum-product, log domain) on a driver-side
  * factor graph.
  *
  * This is the semantics oracle for [[SparkLBP]] (tested for agreement) and
  * the engine used by [[Learning]] on the small validation graph, where 20
  * gradient epochs x several BP sweeps would be latency-bound as Spark
  * rounds. It implements the paper's type-ordered schedule: within every
  * sweep the transitive factors (U1-U3) update first, then fact inclusion
  * (U4), then consistency (U5-U7); unary factors are folded into variable
  * priors (see [[Model]]).
  */
object LocalBP {

  final case class Config(sweeps: Int = 20, damping: Double = 0.3, tol: Double = 1e-4)

  final case class Result(
      varBeliefs: Map[Long, Array[Double]],
      factorBeliefs: Map[Long, Array[Double]],
      sweepsRun: Int,
      converged: Boolean)

  private def logSumExp(a: Array[Double]): Double = {
    var m = Double.NegativeInfinity
    var i = 0
    while (i < a.length) { if (a(i) > m) m = a(i); i += 1 }
    if (m == Double.NegativeInfinity) return m
    var s = 0.0
    i = 0
    while (i < a.length) { s += math.exp(a(i) - m); i += 1 }
    m + math.log(s)
  }

  private def normalizeLog(a: Array[Double]): Unit = {
    val z = logSumExp(a)
    var i = 0
    while (i < a.length) { a(i) -= z; i += 1 }
  }

  private def softmax(a: Array[Double]): Array[Double] = {
    val z = logSumExp(a)
    a.map(x => math.exp(x - z))
  }

  def run(vars: Seq[VarNode], factors: Seq[FactorNode], weights: Weights,
          mask: FeatureMask, cfg: Config = Config()): Result = {
    val varArr = vars.toArray
    val idx = varArr.iterator.map(_.id).zipWithIndex.toMap
    val nVars = varArr.length

    // instantiated log-priors per variable
    val prior = varArr.map { v =>
      val w = weights(v.family); val m = mask(v.family)
      v.feats.map(f => dot(w, m, f))
    }

    val facArr = factors.toArray
    val facVars = facArr.map(_.vars.map(idx))
    val facDomains = facArr.map(_.domains)
    val facLogPot = facArr.map { f =>
      val w = weights(f.family); val m = mask(f.family)
      f.feats.map(ft => dot(w, m, ft))
    }

    // messages: per factor, per neighbor position
    val f2v = facArr.indices.map(fi =>
      facDomains(fi).map(d => new Array[Double](d))).toArray
    val v2f = facArr.indices.map(fi =>
      facDomains(fi).map(d => new Array[Double](d))).toArray

    // incidences per variable
    val incident = Array.fill(nVars)(List.empty[(Int, Int)])
    for (fi <- facArr.indices; p <- facVars(fi).indices)
      incident(facVars(fi)(p)) = (fi, p) :: incident(facVars(fi)(p))

    val groups = Family.scheduleGroups.map(g =>
      facArr.indices.filter(fi => g.contains(facArr(fi).family)).toArray)

    def varSums(): Array[Array[Double]] = {
      val s = Array.tabulate(nVars)(vi => prior(vi).clone())
      for (fi <- facArr.indices; p <- facVars(fi).indices) {
        val vi = facVars(fi)(p)
        val m = f2v(fi)(p)
        var x = 0
        while (x < m.length) { s(vi)(x) += m(x); x += 1 }
      }
      s
    }

    var sweep = 0
    var converged = false
    while (sweep < cfg.sweeps && !converged) {
      var maxDelta = 0.0
      for (group <- groups) {
        // variable -> factor messages for this group (latest beliefs)
        val sums = varSums()
        for (fi <- group; p <- facVars(fi).indices) {
          val vi = facVars(fi)(p)
          val out = v2f(fi)(p)
          val in = f2v(fi)(p)
          var x = 0
          while (x < out.length) { out(x) = sums(vi)(x) - in(x); x += 1 }
          normalizeLog(out)
        }
        // factor -> variable messages
        for (fi <- group) {
          val domains = facDomains(fi)
          val pot = facLogPot(fi)
          val k = domains.length
          val states = new Array[Int](k)
          for (p <- 0 until k) {
            val acc = Array.fill(domains(p))(List.empty[Double])
            var c = 0
            while (c < pot.length) {
              // decode config c (row-major, last var fastest)
              var rem = c
              var j = k - 1
              while (j >= 0) { states(j) = rem % domains(j); rem /= domains(j); j -= 1 }
              var v = pot(c)
              var q = 0
              while (q < k) { if (q != p) v += v2f(fi)(q)(states(q)); q += 1 }
              acc(states(p)) = v :: acc(states(p))
              c += 1
            }
            val fresh = acc.map(l => logSumExp(l.toArray))
            normalizeLog(fresh)
            val old = f2v(fi)(p)
            var x = 0
            while (x < fresh.length) {
              val nv = cfg.damping * old(x) + (1 - cfg.damping) * fresh(x)
              val d = math.abs(nv - old(x))
              if (d > maxDelta) maxDelta = d
              old(x) = nv
              x += 1
            }
            normalizeLog(old)
          }
        }
      }
      sweep += 1
      if (maxDelta < cfg.tol) converged = true
    }

    // final beliefs
    val sums = varSums()
    val varBeliefs = varArr.indices.map(vi => varArr(vi).id -> softmax(sums(vi))).toMap
    // fresh v2f for factor beliefs
    val factorBeliefs = facArr.indices.map { fi =>
      val domains = facDomains(fi)
      val k = domains.length
      val vmsg = Array.tabulate(k) { p =>
        val vi = facVars(fi)(p)
        val out = new Array[Double](domains(p))
        var x = 0
        while (x < out.length) { out(x) = sums(vi)(x) - f2v(fi)(p)(x); x += 1 }
        normalizeLog(out)
        out
      }
      val pot = facLogPot(fi)
      val b = new Array[Double](pot.length)
      val states = new Array[Int](k)
      var c = 0
      while (c < pot.length) {
        var rem = c
        var j = k - 1
        while (j >= 0) { states(j) = rem % domains(j); rem /= domains(j); j -= 1 }
        var v = pot(c)
        var q = 0
        while (q < k) { v += vmsg(q)(states(q)); q += 1 }
        b(c) = v
        c += 1
      }
      facArr(fi).id -> softmax(b)
    }.toMap

    Result(varBeliefs, factorBeliefs, sweep, converged)
  }
}
