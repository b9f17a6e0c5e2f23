package repro.core

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}

class BlockingSpec extends SparkSpec {
  import spark.implicits._

  private def phrases(ps: String*) = ps.toDF("phrase")

  test("token weights match a DuckDB frequency oracle") {
    val ph = phrases("w1 w2", "w1 w3", "w1 w2 w4")
    val freq = Blocking.tokenWeights(ph).select(col("token"), col("freq"))
    Oracle.assertEquivalent(
      freq,
      """SELECT token, COUNT(*) AS freq FROM (
        |  SELECT UNNEST(STRING_SPLIT(phrase, ' ')) AS token FROM ph
        |) GROUP BY token""".stripMargin,
      "ph" -> ph)
  }

  test("pairs sharing a rare stem clear the IDF threshold") {
    // w800 is rare; w0 is the frequent category word
    val ph = phrases("w0 w800", "w800", "w0 w808", "w0 w816", "w0 w824")
    val pairs = Blocking.pairs(spark, ph, ph)
      .select("p1", "p2").as[(String, String)].collect().toSet
    assert(pairs.contains(("w0 w800", "w800")))
  }

  test("pairs sharing only the frequent word are blocked out") {
    val ph = phrases("w0 w800", "w0 w808", "w0 w816", "w0 w824", "w0 w832", "w0 w840")
    val pairs = Blocking.pairs(spark, ph, ph,
      Blocking.Config(idfThreshold = 0.5, embThreshold = 0.99))
      .select("p1", "p2").as[(String, String)].collect().toSet
    // every pair shares only w0 (freq 6) against two rare words
    assert(pairs.isEmpty)
  }

  test("synonym variants pair via the embedding-concept bucket") {
    // w800 and w801 share concept 100, no common stem
    val ph = phrases("w0 w800", "w0 w801", "w0 w808")
    val pairs = Blocking.pairs(spark, ph, ph,
      Blocking.Config(idfThreshold = 0.99, embThreshold = 0.6))
      .select("p1", "p2").as[(String, String)].collect().toSet
    assert(pairs.contains(("w0 w800", "w0 w801")))
  }

  test("sim_idf matches the pure-scala IDF overlap") {
    val ph = phrases("w1 w2", "w1 w3", "w2 w3")
    val freqMap = Map("w1" -> 2L, "w2" -> 2L, "w3" -> 2L).withDefaultValue(1L)
    val got = Blocking.pairs(spark, ph, ph, Blocking.Config(idfThreshold = 0.0, embThreshold = 0.0))
      .select("p1", "p2", "sim_idf").as[(String, String, Double)].collect()
    got.foreach { case (a, b, s) =>
      val expect = repro.text.StringSim.idfOverlap(a, b, freqMap)
      assert(math.abs(s - expect) < 1e-9, s"($a, $b)")
    }
    assert(got.nonEmpty)
  }

  test("typo variants stay blocked together through stemming") {
    val ph = phrases("w0 w800", "w0 w800x", "w0 w808")
    val pairs = Blocking.pairs(spark, ph, ph)
      .select("p1", "p2").as[(String, String)].collect().toSet
    assert(pairs.contains(("w0 w800", "w0 w800x")))
  }

  test("pair list is symmetric-free (p1 < p2) and distinct") {
    val ph = phrases("w800 w1", "w800 w2", "w800 w3")
    val rows = Blocking.pairs(spark, ph, ph, Blocking.Config(idfThreshold = 0.1))
      .select("p1", "p2").as[(String, String)].collect()
    rows.foreach { case (a, b) => assert(a < b) }
    assert(rows.distinct.length == rows.length)
  }

  test("acronyms produce no pair variables") {
    val ph = phrases("acr7", "w0 w800", "w0 w808")
    val pairs = Blocking.pairs(spark, ph, ph)
      .select("p1", "p2").as[(String, String)].collect()
    pairs.foreach { case (a, b) =>
      assert(a != "acr7" && b != "acr7")
    }
  }

  test("capPerPhrase keeps at most k partners per phrase") {
    val ph = phrases((1 to 12).map(i => s"w800 w${900 + i}"): _*)
    val pairs = Blocking.pairs(spark, ph, ph, Blocking.Config(idfThreshold = 0.05))
    val capped = Blocking.capPerPhrase(pairs, 3)
    val counts = capped.select(explode(array(col("p1"), col("p2"))).as("p"))
      .groupBy("p").count().as[(String, Long)].collect().toMap
    counts.values.foreach(c => assert(c <= 6)) // <= k on each side
    assert(capped.count() <= pairs.count())
  }

  test("blocked pair similarities are all within [0, 1]") {
    val world = repro.synth.OkbGen.generate(repro.synth.WorldConfig.reverb45kLite(0.05))
    val ph = world.okbDf(spark).triples.select(col("subj").as("phrase")).distinct()
    val rows = Blocking.pairs(spark, ph, ph)
      .select("sim_idf", "sim_idf_stem", "sim_emb")
      .as[(Double, Double, Double)].collect()
    assert(rows.nonEmpty)
    rows.foreach { case (a, b, c) =>
      assert(a >= -1e-9 && a <= 1 + 1e-9)
      assert(b >= -1e-9 && b <= 1 + 1e-9)
      assert(c >= -1e-9 && c <= 1 + 1e-9)
    }
  }
}
