package repro.mining

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.text.StringSim

/** AMIE-style statistical rule mining restricted to the rule shape JOCL
  * consumes: bidirectional implications p_i => p_j between relation phrases
  * (Galárraga et al., WWW 2013, as used by the paper's f_AMIE signal and
  * the Table 2 AMIE baseline).
  *
  * Input triples are morphologically normalized; the support of p1 => p2 is
  * the number of distinct normalized (subject, object) pairs asserted by
  * both RPs, and the confidence is support / #pairs(p1). Two RPs are
  * equivalent iff both directions reach the support and confidence
  * thresholds.
  */
object Amie {

  /** Default thresholds are tuned for OIE-style redundancy: surface-form
    * variance of the NPs keeps exact (s,o) co-occurrence sparse, so the
    * paper's observation that "AMIE only covers very few RPs" emerges with a
    * strict confidence; 0.1 keeps coverage low but non-degenerate.
    */
  final case class Config(minSupport: Int = 2, minConfidence: Double = 0.2)

  private val normalize = udf((s: String) => StringSim.morphNormalize(s))

  /** Normalized distinct facts (ns, np, no) of an OKB triple table. */
  def normalizedFacts(triples: DataFrame): DataFrame =
    triples.select(
      normalize(col("subj")).as("ns"),
      normalize(col("pred")).as("np"),
      normalize(col("obj")).as("no"),
    ).distinct()

  /** Equivalent *normalized* RP pairs with their statistics.
    *
    * @return columns `p1`, `p2` (p1 < p2), `support`, `conf12`, `conf21`
    */
  def equivalentNormPairs(triples: DataFrame, cfg: Config = Config()): DataFrame = {
    val facts = normalizedFacts(triples).cache()
    val sizes = facts.groupBy(col("np").as("p")).agg(count(lit(1)).as("n_pairs"))

    val co = facts.as("a")
      .join(facts.as("b"),
        col("a.ns") === col("b.ns") && col("a.no") === col("b.no") &&
          col("a.np") < col("b.np"))
      .groupBy(col("a.np").as("p1"), col("b.np").as("p2"))
      .agg(count(lit(1)).as("support"))

    val out = co
      .join(sizes.withColumnRenamed("p", "p1").withColumnRenamed("n_pairs", "n1"), "p1")
      .join(sizes.withColumnRenamed("p", "p2").withColumnRenamed("n_pairs", "n2"), "p2")
      .select(
        col("p1"), col("p2"), col("support"),
        (col("support") / col("n1")).as("conf12"),
        (col("support") / col("n2")).as("conf21"),
      )
      .filter(
        col("support") >= cfg.minSupport &&
          col("conf12") >= cfg.minConfidence && col("conf21") >= cfg.minConfidence)
    out
  }

  /** Equivalence on raw RPs: two RPs are AMIE-equivalent iff their
    * normalized forms are identical (same relation after normalization —
    * AMIE's input granularity) or form a mined bidirectional rule.
    *
    * @param rps distinct raw RPs, single column `rp`
    * @return columns `rp1`, `rp2` (rp1 < rp2) for each equivalent raw pair
    */
  def equivalentRawPairs(triples: DataFrame, rps: DataFrame,
                         cfg: Config = Config()): DataFrame = {
    val normed = rps.select(col("rp"), normalize(col("rp")).as("np")).cache()
    val sameNorm = normed.as("a")
      .join(normed.as("b"), col("a.np") === col("b.np") && col("a.rp") < col("b.rp"))
      .select(col("a.rp").as("rp1"), col("b.rp").as("rp2"))

    val mined = equivalentNormPairs(triples, cfg)
    val minedRaw = mined
      .join(normed.withColumnRenamed("np", "p1").withColumnRenamed("rp", "raw1"), "p1")
      .join(normed.withColumnRenamed("np", "p2").withColumnRenamed("rp", "raw2"), "p2")
      .filter(col("raw1") =!= col("raw2"))
      .select(
        least(col("raw1"), col("raw2")).as("rp1"),
        greatest(col("raw1"), col("raw2")).as("rp2"),
      )

    sameNorm.union(minedRaw).distinct()
  }
}
