package repro.core

/** Factor-graph model types shared by the local reference BP engine, the
  * distributed Spark BP engine, and the learner.
  *
  * Every factor function in JOCL is exponential-linear (paper Eq. 1):
  * H_j(C_j) = (1/Z_j) exp{w^T h_j(C_j)}. We therefore represent each node by
  * its *feature table* and instantiate log-potentials as dot products with
  * the current weight vector of the node's family. Unary factors (F1..F6)
  * are folded into their variable as a prior feature table — their BP
  * message to the variable is constant, and learning recovers their
  * expectations from variable beliefs.
  */
object Model {

  /** Weight families and their feature layouts (paper §3.1–§3.3). */
  object Family {
    val F1 = "F1"; val F2 = "F2"; val F3 = "F3" // canonicalization priors
    val F4 = "F4"; val F5 = "F5"; val F6 = "F6" // linking priors
    val U1 = "U1"; val U2 = "U2"; val U3 = "U3" // transitive relation
    val U4 = "U4" // fact inclusion
    val U5 = "U5"; val U6 = "U6"; val U7 = "U7" // consistency

    /** Feature names per family, in table order. */
    val features: Map[String, Vector[String]] = Map(
      F1 -> Vector("idf", "emb", "ppdb"),
      F3 -> Vector("idf", "emb", "ppdb"),
      F2 -> Vector("idf", "emb", "ppdb", "amie", "kbp"),
      F4 -> Vector("pop", "emb", "ppdb"),
      F6 -> Vector("pop", "emb", "ppdb"),
      F5 -> Vector("ngram", "ld", "emb", "ppdb"),
      U1 -> Vector("trans"), U2 -> Vector("trans"), U3 -> Vector("trans"),
      U4 -> Vector("incl"),
      U5 -> Vector("cons"), U6 -> Vector("cons"), U7 -> Vector("cons"),
    )

    val all: Vector[String] =
      Vector(F1, F2, F3, F4, F5, F6, U1, U2, U3, U4, U5, U6, U7)

    /** The paper's LBP schedule groups factor families into sub-rounds:
      * transitive, then fact inclusion, then consistency (§3.4).
      */
    val scheduleGroups: Vector[Set[String]] =
      Vector(Set(U1, U2, U3), Set(U4), Set(U5, U6, U7))
  }

  /** Weights per family. */
  final case class Weights(w: Map[String, Array[Double]]) {
    def apply(family: String): Array[Double] = w(family)
    def updated(family: String, v: Array[Double]): Weights = Weights(w.updated(family, v))
  }

  object Weights {
    /** Uniform initialization (1.0 everywhere), paper-style. */
    def init(value: Double = 1.0): Weights =
      Weights(Family.features.map { case (f, names) => f -> Array.fill(names.size)(value) })
  }

  /** Feature masks implementing the Table 5 variants: a masked feature
    * contributes nothing to the potential (its weight is treated as 0).
    */
  final case class FeatureMask(m: Map[String, Array[Boolean]]) {
    def apply(family: String): Array[Boolean] = m(family)
  }

  object FeatureMask {
    private def of(keep: Map[String, Set[String]]): FeatureMask =
      FeatureMask(Family.features.map { case (f, names) =>
        f -> names.map(n => keep.get(f).forall(_.contains(n))).toArray
      })

    /** All features on. */
    val all: FeatureMask = of(Map.empty)

    /** JOCL-single: f_idf / f_pop / f_ngram only (Table 5). */
    val single: FeatureMask = of(Map(
      Family.F1 -> Set("idf"), Family.F3 -> Set("idf"), Family.F2 -> Set("idf"),
      Family.F4 -> Set("pop"), Family.F6 -> Set("pop"), Family.F5 -> Set("ngram"),
    ))

    /** JOCL-double: adds the embedding feature everywhere (Table 5). */
    val double: FeatureMask = of(Map(
      Family.F1 -> Set("idf", "emb"), Family.F3 -> Set("idf", "emb"),
      Family.F2 -> Set("idf", "emb"),
      Family.F4 -> Set("pop", "emb"), Family.F6 -> Set("pop", "emb"),
      Family.F5 -> Set("ngram", "emb"),
    ))
  }

  /** Masked dot product: the instantiated log-potential of one state/config. */
  def dot(w: Array[Double], mask: Array[Boolean], feats: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < feats.length) { if (mask(i)) s += w(i) * feats(i); i += 1 }
    s
  }

  /** A variable node.
    *
    * @param id      globally unique id (see [[Ids]])
    * @param domain  number of states
    * @param family  unary (F*) family whose weights score `feats`
    * @param feats   state-major feature table: domain x |features(family)|
    * @param states  external id of each state — the CKB entity/relation id
    *                for linking variables (-1 = NIL), or 0/1 for pair
    *                variables; used by U4/U5 feature construction and decode
    * @param gold    gold state index, -1 if unknown
    */
  final case class VarNode(id: Long, domain: Int, family: String,
                           feats: Array[Array[Double]], states: Array[Long], gold: Int)

  /** A higher-order factor node (U1..U7).
    *
    * @param domains domain size of each neighbor variable, in `vars` order
    * @param feats   config-major feature table, configs enumerated row-major
    *                with the LAST variable varying fastest:
    *                idx = (x_0 * d_1 + x_1) * d_2 + x_2
    */
  final case class FactorNode(id: Long, family: String, vars: Array[Long],
                              domains: Array[Int], feats: Array[Array[Double]])

  /** Config-index arithmetic for factor tables. */
  object Configs {
    def count(domains: Array[Int]): Int = domains.product

    def index(domains: Array[Int], states: Array[Int]): Int = {
      var idx = 0
      var i = 0
      while (i < domains.length) { idx = idx * domains(i) + states(i); i += 1 }
      idx
    }

    /** State of variable `pos` in config `idx`. */
    def stateOf(domains: Array[Int], idx: Int, pos: Int): Int = {
      var rem = idx
      var i = domains.length - 1
      var out = -1
      while (i >= 0) {
        val s = rem % domains(i)
        if (i == pos) out = s
        rem /= domains(i)
        i -= 1
      }
      out
    }
  }

  /** Id-space layout: variable / factor ids are unique across node kinds. */
  object Ids {
    val SubjLink = 0L
    val PredLink = 1000000000L
    val ObjLink = 2000000000L
    val SubjPair = 3000000000L
    val PredPair = 4000000000L
    val ObjPair = 5000000000L
    val FactorBase = 6000000000L
  }

  /** Heuristic scores used by the U feature functions (paper §3.1.5/§3.2.5/§3.3). */
  object Scores {
    val TransHigh = 0.9; val TransMid = 0.5; val TransLow = 0.1
    val InclHigh = 0.9; val InclLow = 0.1
    val ConsHigh = 0.7; val ConsLow = 0.3; val ConsNeutral = 0.5

    /** u1/u2/u3: reward transitive-consistent triples of pair states. */
    def transitive(a: Int, b: Int, c: Int): Double = {
      val sum = a + b + c
      if (sum == 3) TransHigh
      else if (sum == 2) TransLow // exactly one 0 violates transitivity
      else TransMid
    }

    /** u4: reward link configs that form a CKB fact. */
    def inclusion(isFact: Boolean): Double = if (isFact) InclHigh else InclLow

    /** u5/u6/u7: reward canonicalization/linking consistency; neutral when a
      * linking variable is NIL (linking abstains; DESIGN.md §2).
      */
    def consistency(idA: Long, idB: Long, pairState: Int): Double = {
      if (idA < 0 || idB < 0) ConsNeutral
      else {
        val equal = idA == idB
        if ((equal && pairState == 1) || (!equal && pairState == 0)) ConsHigh
        else ConsLow
      }
    }
  }
}
