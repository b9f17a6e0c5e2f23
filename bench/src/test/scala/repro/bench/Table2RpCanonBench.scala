package repro.bench

import repro.harness.Tables

/** Reproduces Table 2: RP canonicalization on reverb45k-lite (AMIE, PATTY,
  * SIST, JOCL).
  */
class Table2RpCanonBench extends BenchBase {

  private lazy val rows = Tables.table2(spark, reverb, engine)

  test("print Table 2") {
    report(Tables.renderCanon("Table 2: RP canonicalization (reverb45k-lite)", rows))
    assert(rows.map(_.method) == Seq("AMIE", "PATTY", "SIST", "JOCL"))
  }

  test("shape: AMIE is the weakest method (low rule coverage)") {
    val amie = rows.find(_.method == "AMIE").get
    val others = rows.filterNot(_.method == "AMIE")
    assert(others.forall(_.scores.avgF1 >= amie.scores.avgF1 - 0.02),
      rows.map(r => s"${r.method}=${r.scores.avgF1}").mkString(", "))
  }

  test("shape: JOCL is at or near the top on avg F1") {
    val jocl = rows.find(_.method == "JOCL").get
    val best = rows.maxBy(_.scores.avgF1)
    assert(best.method == "JOCL" || jocl.scores.avgF1 >= best.scores.avgF1 - 0.03,
      rows.map(r => s"${r.method}=${r.scores.avgF1}").mkString(", "))
  }
}
