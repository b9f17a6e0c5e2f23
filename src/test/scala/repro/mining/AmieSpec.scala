package repro.mining

import org.apache.spark.sql.DataFrame

import repro.{Oracle, SparkSpec}

class AmieSpec extends SparkSpec {
  import spark.implicits._

  private def triples(rows: (Long, String, String, String)*): DataFrame =
    rows.toSeq.toDF("triple_id", "subj", "pred", "obj")

  test("bidirectional rule above thresholds yields an equivalent pair") {
    val t = triples(
      (1, "w800", "be w80000 of", "w808"),
      (2, "w800", "be w80001 of", "w808"),
      (3, "w816", "be w80000 of", "w824"),
      (4, "w816", "be w80001 of", "w824"),
    )
    val eq = Amie.equivalentNormPairs(t, Amie.Config(minSupport = 2, minConfidence = 0.5))
      .select("p1", "p2").as[(String, String)].collect().toSet
    assert(eq == Set(("w80000", "w80001")))
  }

  test("support below threshold is rejected") {
    val t = triples(
      (1, "w800", "be w80000 of", "w808"),
      (2, "w800", "be w80001 of", "w808"),
    )
    val eq = Amie.equivalentNormPairs(t, Amie.Config(minSupport = 2, minConfidence = 0.5))
    assert(eq.count() == 0)
  }

  test("one-directional implication is rejected") {
    // p2 always implies p1, but p1 holds for many more pairs
    val rows = (1L to 8L).map(i => (i, s"w${800 + i * 8}", "be w80000 of", "w1600")) ++
      Seq((9L, "w808", "be w80001 of", "w1600"), (10L, "w816", "be w80001 of", "w1600"))
    val eq = Amie.equivalentNormPairs(triples(rows: _*),
      Amie.Config(minSupport = 2, minConfidence = 0.5))
    assert(eq.count() == 0) // conf(p1 => p2) = 2/8 < 0.5
  }

  test("morphological variants count as the same relation") {
    val t = triples(
      (1, "w800", "be w80000ed of", "w808"),
      (2, "w800", "be early w80000 of", "w808"),
    )
    val facts = Amie.normalizedFacts(t)
    assert(facts.count() == 1) // identical after normalization
  }

  test("support and confidence match a DuckDB oracle") {
    val t = triples(
      (1, "w800", "p one", "w808"),
      (2, "w800", "q one", "w808"),
      (3, "w816", "p one", "w824"),
      (4, "w816", "q one", "w824"),
      (5, "w832", "p one", "w840"),
    )
    val facts = Amie.normalizedFacts(t).cache()
    val co = facts.as("a")
      .join(facts.as("b"),
        $"a.ns" === $"b.ns" && $"a.no" === $"b.no" && $"a.np" < $"b.np")
      .groupBy($"a.np".as("p1"), $"b.np".as("p2"))
      .agg(org.apache.spark.sql.functions.count(
        org.apache.spark.sql.functions.lit(1)).as("support"))
    Oracle.assertEquivalent(
      co,
      """SELECT a.np AS p1, b.np AS p2, COUNT(*) AS support
        |FROM facts a JOIN facts b ON a.ns = b.ns AND a.no = b.no AND a.np < b.np
        |GROUP BY a.np, b.np""".stripMargin,
      "facts" -> facts)
  }

  test("equivalentRawPairs links raw RPs through their normal forms") {
    val t = triples(
      (1, "w800", "be w80000 of", "w808"),
      (2, "w800", "be w80000ed of", "w808"),
    )
    val rps = Seq("be w80000 of", "be w80000ed of").toDF("rp")
    val eq = Amie.equivalentRawPairs(t, rps).as[(String, String)].collect().toSet
    assert(eq == Set(("be w80000 of", "be w80000ed of")))
  }

  test("equivalentRawPairs projects mined rules onto raw forms") {
    val t = triples(
      (1, "w800", "be w80000 of", "w808"),
      (2, "w800", "have w80001 with", "w808"),
      (3, "w816", "be w80000 of", "w824"),
      (4, "w816", "have w80001 with", "w824"),
    )
    val rps = Seq("be w80000 of", "have w80001 with").toDF("rp")
    val eq = Amie.equivalentRawPairs(t, rps).as[(String, String)].collect().toSet
    assert(eq == Set(("be w80000 of", "have w80001 with")))
  }

  test("duplicate triples do not inflate support") {
    val t = triples(
      (1, "w800", "be w80000 of", "w808"),
      (2, "w800", "be w80000 of", "w808"),
      (3, "w800", "be w80001 of", "w808"),
    )
    val eq = Amie.equivalentNormPairs(t, Amie.Config(minSupport = 2, minConfidence = 0.1))
    assert(eq.count() == 0) // only one distinct shared (s,o) pair
  }

  test("no rules from an empty OKB") {
    val eq = Amie.equivalentNormPairs(triples())
    assert(eq.count() == 0)
  }

  test("synthetic reverb world mines at least one paraphrase rule") {
    val world = repro.synth.OkbGen.generate(repro.synth.WorldConfig.reverb45kLite(0.25))
    val okb = world.okbDf(spark)
    val eq = Amie.equivalentNormPairs(okb.triples,
      Amie.Config(minSupport = 2, minConfidence = 0.05))
    assert(eq.count() >= 1)
  }
}
