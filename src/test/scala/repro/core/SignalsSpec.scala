package repro.core

import repro.SparkSpec

class SignalsSpec extends SparkSpec {
  import spark.implicits._

  private def pairs(rows: (String, String, Double, Double)*) =
    rows.toSeq.toDF("p1", "p2", "sim_idf", "sim_emb")

  test("npPairSignals renames sims and adds ppdb") {
    val ppdb = Map("a" -> 1L, "b" -> 1L, "c" -> 2L)
    val out = Signals.npPairSignals(pairs(("a", "b", 0.8, 0.6), ("a", "c", 0.3, 0.2)), ppdb)
      .as[(String, String, Double, Double, Double)].collect()
      .map(r => (r._1, r._2) -> (r._3, r._4, r._5)).toMap
    assert(out(("a", "b")) == ((0.8, 0.6, 1.0)))
    assert(out(("a", "c")) == ((0.3, 0.2, 0.0)))
  }

  test("ppdb mismatch or absence yields 0") {
    val out = Signals.npPairSignals(pairs(("x", "y", 0.1, 0.1)), Map("x" -> 5L))
      .as[(String, String, Double, Double, Double)].collect()
    assert(out.head._5 == 0.0)
  }

  test("rpPairSignals joins AMIE equivalences") {
    val amie = Seq(("p a", "p b")).toDF("rp1", "rp2")
    val out = Signals.rpPairSignals(
      pairs(("p a", "p b", 0.5, 0.5), ("p a", "p c", 0.5, 0.5)),
      Map.empty, Map.empty, amie)
      .as[(String, String, Double, Double, Double, Double, Double)].collect()
      .map(r => (r._1, r._2) -> r._6).toMap
    assert(out(("p a", "p b")) == 1.0)
    assert(out(("p a", "p c")) == 0.0)
  }

  test("rpPairSignals computes KBP agreement on normalized forms") {
    val kbp = Map("w80000" -> 3L, "w80001" -> 3L, "w80008" -> 4L)
    val out = Signals.rpPairSignals(
      pairs(("be w80000 of", "be w80001 of", 0.2, 0.8),
            ("be w80000 of", "be w80008 of", 0.2, 0.2)),
      Map.empty, kbp, Seq.empty[(String, String)].toDF("rp1", "rp2"))
      .as[(String, String, Double, Double, Double, Double, Double)].collect()
      .map(r => (r._1, r._2) -> r._7).toMap
    assert(out(("be w80000 of", "be w80001 of")) == 1.0)
    assert(out(("be w80000 of", "be w80008 of")) == 0.0)
  }

  test("tense variants agree through KBP normalization") {
    val kbp = Map("w80000" -> 3L)
    val out = Signals.rpPairSignals(
      pairs(("be w80000 of", "be w80000ed of", 0.9, 0.9)),
      Map.empty, kbp, Seq.empty[(String, String)].toDF("rp1", "rp2"))
      .as[(String, String, Double, Double, Double, Double, Double)].collect()
    assert(out.head._7 == 1.0)
  }

  test("all signal columns are present in order") {
    val out = Signals.rpPairSignals(pairs(("a", "b", 0.1, 0.2)), Map.empty, Map.empty,
      Seq.empty[(String, String)].toDF("rp1", "rp2"))
    assert(out.columns.toSeq == Seq("p1", "p2", "f_idf", "f_emb", "f_ppdb", "f_amie", "f_kbp"))
  }
}
