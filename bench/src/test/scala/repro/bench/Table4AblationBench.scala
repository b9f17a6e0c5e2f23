package repro.bench

import repro.harness.Tables

/** Reproduces Table 4: the interaction ablation — JOCL working on each
  * task alone (consistency factors removed) vs the full joint model.
  */
class Table4AblationBench extends BenchBase {

  private lazy val rows = Tables.table4(spark, reverb, engine)

  test("print Table 4") {
    report(Tables.renderAblation(rows))
    assert(rows.map(_.variant) == Seq("JOCL_cano", "JOCL_link", "JOCL"))
  }

  test("shape: joint JOCL beats the canonicalization-only ablation") {
    val cano = rows.find(_.variant == "JOCL_cano").get.scores.get.avgF1
    val full = rows.find(_.variant == "JOCL").get.scores.get.avgF1
    assert(full >= cano, s"joint $full vs cano-only $cano")
  }

  test("shape: joint JOCL beats the linking-only ablation") {
    val link = rows.find(_.variant == "JOCL_link").get.accuracy.get
    val full = rows.find(_.variant == "JOCL").get.accuracy.get
    assert(full >= link, s"joint $full vs link-only $link")
  }
}
