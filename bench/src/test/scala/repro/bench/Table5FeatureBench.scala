package repro.bench

import repro.harness.Tables

/** Reproduces Table 5 (the numbers behind Figure 4): JOCL-single /
  * JOCL-double / JOCL-all feature combinations, scored on NP
  * canonicalization (avg F1) and entity linking (accuracy).
  */
class Table5FeatureBench extends BenchBase {

  private lazy val rows = Tables.table5(spark, reverb, engine)

  test("print Table 5 / Figure 4") {
    report(Tables.renderFeatures(rows))
    assert(rows.map(_.variant) == Seq("JOCL-single", "JOCL-double", "JOCL-all"))
  }

  test("shape: more features do not hurt canonicalization") {
    val single = rows.find(_.variant == "JOCL-single").get
    val all = rows.find(_.variant == "JOCL-all").get
    assert(all.canonScores.avgF1 >= single.canonScores.avgF1 - 0.03,
      rows.map(r => s"${r.variant}=${r.canonScores.avgF1}").mkString(", "))
  }

  test("shape: more features do not hurt linking") {
    val single = rows.find(_.variant == "JOCL-single").get
    val all = rows.find(_.variant == "JOCL-all").get
    assert(all.accuracy >= single.accuracy - 0.03,
      rows.map(r => s"${r.variant}=${r.accuracy}").mkString(", "))
  }
}
