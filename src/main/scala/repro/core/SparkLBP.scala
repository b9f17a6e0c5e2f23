package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}

import repro.core.Model._

/** Distributed loopy belief propagation over Spark Datasets.
  *
  * Messages are rows keyed by (factor, neighbor position); each sweep runs
  * the paper's type-ordered sub-rounds (U1-U3, then U4, then U5-U7). For
  * every sub-round the engine
  *   1. aggregates factor->variable messages into per-variable belief sums
  *      (groupByKey over the message Dataset),
  *   2. derives variable->factor messages for the sub-round's factors
  *      (belief sum minus own incoming message), and
  *   3. recomputes the sub-round's factor->variable messages in a
  *      mapGroups over the factor's neighbor messages + feature table.
  * Message state is localCheckpointed every sub-round to keep lineage flat.
  * Semantics match [[LocalBP]] exactly (agreement-tested).
  */
object SparkLBP {

  final case class Config(sweeps: Int = 8, damping: Double = 0.3)

  /** One factor->variable (or variable->factor) message. */
  final case class Msg(f: Long, fam: String, p: Int, v: Long, m: Array[Double])

  /** Instantiated factor spec (log-potentials under the current weights). */
  final case class FacSpec(f: Long, fam: String, vars: Array[Long],
                           domains: Array[Int], logPot: Array[Double])

  final case class VarPrior(v: Long, prior: Array[Double])

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

  private def normalizedLog(a: Array[Double]): Array[Double] = {
    val z = logSumExp(a)
    a.map(_ - z)
  }

  /** Run BP and return variable beliefs: columns `var_id`, `belief`. */
  def run(spark: SparkSession, vars: Dataset[VarNode], factors: Dataset[FactorNode],
          weights: Weights, mask: FeatureMask, cfg: Config = Config()): DataFrame = {
    import spark.implicits._

    val wB = spark.sparkContext.broadcast(weights)
    val mB = spark.sparkContext.broadcast(mask)

    val priors: Dataset[VarPrior] = vars.map { v =>
      val w = wB.value(v.family); val m = mB.value(v.family)
      VarPrior(v.id, v.feats.map(f => dot(w, m, f)))
    }.localCheckpoint(true)

    val specs: Dataset[FacSpec] = factors.map { f =>
      val w = wB.value(f.family); val m = mB.value(f.family)
      FacSpec(f.id, f.family, f.vars, f.domains, f.feats.map(ft => dot(w, m, ft)))
    }.localCheckpoint(true)

    // messages partitioned by schedule group, so each sub-round only
    // re-materializes the third it actually updates
    val groups = Family.scheduleGroups
    val f2vByGroup: Array[Dataset[Msg]] = groups.map { g =>
      specs.filter(s => g.contains(s.fam)).flatMap { s =>
        s.vars.indices.map(p =>
          Msg(s.f, s.fam, p, s.vars(p), new Array[Double](s.domains(p))))
      }.localCheckpoint(true)
    }.toArray

    /** belief sums = prior + sum of incoming f2v, per variable */
    def beliefSums(msgs: Dataset[Msg]): Dataset[VarPrior] = {
      val incoming = msgs.groupByKey(_.v).mapGroups { (v, it) =>
        var acc: Array[Double] = null
        it.foreach { msg =>
          if (acc == null) acc = msg.m.clone()
          else { var i = 0; while (i < acc.length) { acc(i) += msg.m(i); i += 1 } }
        }
        VarPrior(v, acc)
      }
      priors.joinWith(incoming, priors("v") === incoming("v"), "left")
        .map { case (pr, in) =>
          if (in == null) pr
          else {
            val s = pr.prior.clone()
            var i = 0
            while (i < s.length) { s(i) += in.prior(i); i += 1 }
            VarPrior(pr.v, s)
          }
        }
    }

    val damping = cfg.damping
    var sweep = 0
    while (sweep < cfg.sweeps) {
      for (gi <- groups.indices) {
        val all = f2vByGroup.reduce(_ union _)
        val sums = beliefSums(all)
        val inGroup = f2vByGroup(gi)

        // variable -> factor messages for this group's factors, paired with
        // the old outgoing message for damping
        val work = inGroup.joinWith(sums, inGroup("v") === sums("v"))
          .map { case (msg, s) =>
            val out = new Array[Double](msg.m.length)
            var i = 0
            while (i < out.length) { out(i) = s.prior(i) - msg.m(i); i += 1 }
            Msg(msg.f, msg.fam, msg.p, msg.v, normalizedLog(out) ++ msg.m)
            // m = [v2f message | old f2v message] packed to keep one Dataset
          }

        val updated = work
          .joinWith(specs, work("f") === specs("f"))
          .groupByKey(_._2.f)
          .flatMapGroups { (_, it) =>
            val rows = it.toArray.sortBy(_._1.p)
            val spec = rows.head._2
            val k = spec.domains.length
            val vmsg = Array.ofDim[Array[Double]](k)
            val oldm = Array.ofDim[Array[Double]](k)
            rows.foreach { case (msg, _) =>
              val d = spec.domains(msg.p)
              vmsg(msg.p) = msg.m.take(d)
              oldm(msg.p) = msg.m.drop(d)
            }
            val states = new Array[Int](k)
            (0 until k).map { p =>
              val acc = Array.fill(spec.domains(p))(Double.NegativeInfinity)
              val cnt = Array.fill(spec.domains(p))(List.empty[Double])
              var c = 0
              while (c < spec.logPot.length) {
                var rem = c
                var j = k - 1
                while (j >= 0) { states(j) = rem % spec.domains(j); rem /= spec.domains(j); j -= 1 }
                var v = spec.logPot(c)
                var q = 0
                while (q < k) { if (q != p) v += vmsg(q)(states(q)); q += 1 }
                cnt(states(p)) = v :: cnt(states(p))
                c += 1
              }
              var x = 0
              while (x < acc.length) { acc(x) = logSumExp(cnt(x).toArray); x += 1 }
              val fresh = normalizedLog(acc)
              val damped = new Array[Double](fresh.length)
              x = 0
              while (x < fresh.length) {
                damped(x) = damping * oldm(p)(x) + (1 - damping) * fresh(x)
                x += 1
              }
              Msg(spec.f, spec.fam, p, spec.vars(p), normalizedLog(damped))
            }
          }

        f2vByGroup(gi) = updated.localCheckpoint(true)
      }
      sweep += 1
    }

    beliefSums(f2vByGroup.reduce(_ union _))
      .map(s => (s.v, normalizedLog(s.prior).map(math.exp)))
      .toDF("var_id", "belief")
  }
}
