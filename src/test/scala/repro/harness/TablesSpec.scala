package repro.harness

import repro.SparkSpec
import repro.synth.WorldConfig

/** Smoke tests of the table harness at tiny scale with the local BP engine
  * (the benches run the same harness at full scale on the Spark engine).
  */
class TablesSpec extends SparkSpec {

  private lazy val reverb = Tables.env(spark, WorldConfig.reverb45kLite(0.06))
  private lazy val nyt = Tables.env(spark, WorldConfig.nytimes2018Lite(0.06))

  test("table 1 produces all 8 methods for each dataset") {
    val rows = Tables.table1(spark, reverb, Seq(nyt), engine = "local")
    assert(rows.map(_.dataset).toSet == Set("reverb45k-lite", "nytimes2018-lite"))
    assert(rows.count(_.dataset == "reverb45k-lite") == 8)
    assert(rows.map(_.method).toSet.size == 8)
    rows.foreach(r => assert(r.scores.avgF1 >= 0.0 && r.scores.avgF1 <= 1.0))
  }

  test("table 2 produces the 4 RP methods") {
    val rows = Tables.table2(spark, reverb, engine = "local")
    assert(rows.map(_.method) == Seq("AMIE", "PATTY", "SIST", "JOCL"))
    rows.foreach(r => assert(r.scores.avgF1 >= 0.0 && r.scores.avgF1 <= 1.0))
  }

  test("table 3 produces the 6 linking methods for each dataset") {
    val rows = Tables.table3(spark, reverb, Seq(nyt), engine = "local")
    assert(rows.count(_.dataset == "reverb45k-lite") == 6)
    rows.foreach(r => assert(r.accuracy >= 0.0 && r.accuracy <= 1.0))
  }

  test("table 4 reports the ablations and the full model") {
    val rows = Tables.table4(spark, reverb, engine = "local")
    assert(rows.map(_.variant) == Seq("JOCL_cano", "JOCL_link", "JOCL"))
    assert(rows(0).scores.isDefined && rows(0).accuracy.isEmpty)
    assert(rows(1).scores.isEmpty && rows(1).accuracy.isDefined)
    assert(rows(2).scores.isDefined && rows(2).accuracy.isDefined)
  }

  test("table 5 reports the three feature variants") {
    val rows = Tables.table5(spark, reverb, engine = "local")
    assert(rows.map(_.variant) == Seq("JOCL-single", "JOCL-double", "JOCL-all"))
  }

  test("renderers produce one line per row") {
    val t4 = Tables.table4(spark, reverb, engine = "local")
    val s = Tables.renderAblation(t4)
    assert(s.linesIterator.size == t4.size + 2)
    val t5 = Tables.table5(spark, reverb, engine = "local")
    assert(Tables.renderFeatures(t5).contains("JOCL-all"))
  }
}
