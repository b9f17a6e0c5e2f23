package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.text.StringSim

/** Completion of the canonicalization feature vectors for blocked pairs.
  *
  * [[Blocking.pairs]] already attaches `sim_idf` and `sim_emb`; this module
  * adds the side-information signals: PPDB (NPs and RPs), and AMIE + KBP
  * (RPs only), yielding the full f_1 / f_2 / f_3 feature vectors of the
  * paper (§3.1.3–§3.1.4).
  */
object Signals {

  private def ppdbSimUdf(ppdb: Map[String, Long]) =
    udf { (a: String, b: String) =>
      (ppdb.get(a), ppdb.get(b)) match {
        case (Some(x), Some(y)) if x == y => 1.0
        case _ => 0.0
      }
    }

  private def kbpSimUdf(kbp: Map[String, Long]) =
    udf { (a: String, b: String) =>
      (kbp.get(StringSim.morphNormalize(a)), kbp.get(StringSim.morphNormalize(b))) match {
        case (Some(x), Some(y)) if x == y => 1.0
        case _ => 0.0
      }
    }

  /** NP pair signals: columns `p1`, `p2`, `f_idf`, `f_emb`, `f_ppdb`. */
  def npPairSignals(pairs: DataFrame, ppdb: Map[String, Long]): DataFrame =
    pairs.select(
      col("p1"), col("p2"),
      col("sim_idf").as("f_idf"),
      col("sim_emb").as("f_emb"),
      ppdbSimUdf(ppdb)(col("p1"), col("p2")).as("f_ppdb"),
    )

  /** RP pair signals: adds `f_amie` (join against mined equivalences) and
    * `f_kbp` (shared KBP relation category).
    *
    * @param amiePairs columns `rp1`, `rp2` (rp1 < rp2) from [[repro.mining.Amie]]
    */
  def rpPairSignals(pairs: DataFrame, ppdb: Map[String, Long],
                    kbp: Map[String, Long], amiePairs: DataFrame): DataFrame = {
    val amie = amiePairs
      .select(col("rp1").as("p1"), col("rp2").as("p2"), lit(1.0).as("f_amie"))
    pairs
      .join(amie, Seq("p1", "p2"), "left")
      .na.fill(Map("f_amie" -> 0.0))
      .select(
        col("p1"), col("p2"),
        col("sim_idf").as("f_idf"),
        col("sim_emb").as("f_emb"),
        ppdbSimUdf(ppdb)(col("p1"), col("p2")).as("f_ppdb"),
        col("f_amie"),
        kbpSimUdf(kbp)(col("p1"), col("p2")).as("f_kbp"),
      )
  }
}
