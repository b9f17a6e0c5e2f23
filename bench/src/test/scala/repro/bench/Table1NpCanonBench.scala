package repro.bench

import repro.harness.Tables

/** Reproduces Table 1: NP canonicalization over reverb45k-lite and
  * nytimes2018-lite (macro / micro / pairwise / average F1 for the seven
  * baselines and JOCL). Paper numbers are recorded next to ours in
  * EXPERIMENTS.md.
  */
class Table1NpCanonBench extends BenchBase {

  private lazy val rows = Tables.table1(spark, reverb, Seq(nyt), engine)

  test("print Table 1") {
    report(Tables.renderCanon("Table 1: NP canonicalization", rows))
    assert(rows.nonEmpty)
  }

  test("all scores are valid") {
    rows.foreach { r =>
      assert(r.scores.avgF1 >= 0.0 && r.scores.avgF1 <= 1.0, r)
    }
  }

  test("shape: JOCL beats Morph Norm on both datasets") {
    for (ds <- Seq("reverb45k-lite", "nytimes2018-lite")) {
      val jocl = rows.find(r => r.method == "JOCL" && r.dataset == ds).get
      val morph = rows.find(r => r.method == "Morph Norm" && r.dataset == ds).get
      assert(jocl.scores.avgF1 > morph.scores.avgF1,
        s"$ds: JOCL ${jocl.scores.avgF1} vs MorphNorm ${morph.scores.avgF1}")
    }
  }

  test("shape: JOCL is the best method on reverb45k-lite avg F1") {
    val reverbRows = rows.filter(_.dataset == "reverb45k-lite")
    val jocl = reverbRows.find(_.method == "JOCL").get
    val best = reverbRows.maxBy(_.scores.avgF1)
    assert(best.method == "JOCL" || jocl.scores.avgF1 >= best.scores.avgF1 - 0.03,
      s"JOCL ${jocl.scores.avgF1} should be at or near the top (best: " +
        s"${best.method} ${best.scores.avgF1})")
  }
}
