package repro.core

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.synth.{OkbGen, WorldConfig}

class CandidatesSpec extends SparkSpec {
  import spark.implicits._

  private lazy val world = OkbGen.generate(WorldConfig.reverb45kLite(0.08))
  private lazy val okb = world.okbDf(spark)
  private lazy val ckb = world.ckbDf(spark)

  private lazy val nps = okb.triples.select(col("subj").as("np"))
    .union(okb.triples.select(col("obj").as("np"))).distinct()

  private lazy val entityCands =
    Candidates.entityCandidates(spark, nps, ckb, world.ppdb).cache()

  test("every NP gets at most topK candidates") {
    val counts = entityCands.groupBy("np").count().as[(String, Long)].collect()
    counts.foreach { case (np, c) => assert(c <= 5, np) }
  }

  test("candidate retrieval recall is high on the reverb-lite preset") {
    val gold = okb.goldSubj.union(okb.goldObj).distinct()
    val hit = gold.join(entityCands,
      gold("np") === entityCands("np") && gold("gold_id") === entityCands("cand_id"))
      .count()
    val total = gold.count()
    assert(hit.toDouble / total > 0.8, s"retrieval recall ${hit.toDouble / total}")
  }

  test("exact anchor matches carry the popularity prior") {
    // canonical names are anchors; their f_pop must be positive
    val canonical = world.entities.head.name
    val rows = entityCands.filter(col("np") === canonical)
      .select("cand_id", "f_pop").as[(Long, Double)].collect()
    assert(rows.nonEmpty)
    assert(rows.exists { case (id, pop) => id == world.entities.head.id && pop > 0 })
  }

  test("popularity normalizes to 1 over exact candidates of an anchor (oracle)") {
    val anchors = ckb.aliases.groupBy(col("alias"), col("entity_id"))
      .agg(sum("anchor_count").as("cnt"))
    val exact = nps.join(anchors, nps("np") === anchors("alias"))
      .select(col("np"), col("entity_id"), col("cnt"))
    val totals = exact.groupBy("np").agg(sum("cnt").as("total"))
    val norm = exact.join(totals, "np")
      .select(col("np"), col("entity_id"), (col("cnt") / col("total")).as("f_pop"))
      .groupBy("np").agg(round(sum("f_pop"), 6).as("pop_sum"))
    Oracle.assertEquivalent(
      norm,
      """SELECT np, ROUND(SUM(f_pop), 6) AS pop_sum FROM (
        |  SELECT e.np, e.entity_id, e.cnt / t.total AS f_pop FROM (
        |    SELECT n.np, a.entity_id, SUM(CAST(a.anchor_count AS DOUBLE)) AS cnt
        |    FROM nps n JOIN aliases a ON n.np = a.alias
        |    GROUP BY n.np, a.entity_id) e
        |  JOIN (
        |    SELECT np, SUM(cnt) AS total FROM (
        |      SELECT n.np, a.entity_id, SUM(CAST(a.anchor_count AS DOUBLE)) AS cnt
        |      FROM nps n JOIN aliases a ON n.np = a.alias
        |      GROUP BY n.np, a.entity_id) GROUP BY np) t
        |  ON e.np = t.np
        |) GROUP BY np""".stripMargin,
      "nps" -> nps, "aliases" -> ckb.aliases)
  }

  test("typo mentions are retrieved through the stem index") {
    // find an entity whose typo alias was used in the OKB
    val typoAliases = world.entities
      .flatMap(e => e.aliases.filter(_.kind == "typo").map(a => a.text -> e.id)).toMap
    val usedTypos = world.triples.map(_.subj).filter(typoAliases.contains).distinct
    if (usedTypos.nonEmpty) {
      val np = usedTypos.head
      val rows = entityCands.filter(col("np") === np)
        .select("cand_id").as[Long].collect().toSet
      assert(rows.contains(typoAliases(np)), s"typo $np should retrieve its entity")
    }
  }

  test("features are bounded in [0, 1]") {
    val rows = entityCands.select("f_pop", "f_emb", "f_ppdb")
      .as[(Double, Double, Double)].collect()
    rows.foreach { case (a, b, c) =>
      assert(a >= 0 && a <= 1 + 1e-9)
      assert(b >= 0 && b <= 1 + 1e-9)
      assert(c == 0.0 || c == 1.0)
    }
  }

  test("ranks are 1..k and deterministic") {
    val byNp = entityCands.select("np", "rank").as[(String, Int)].collect()
      .groupBy(_._1)
    byNp.foreach { case (np, rows) =>
      val ranks = rows.map(_._2).sorted
      assert(ranks.toSeq == (1 to ranks.length), np)
    }
  }

  test("relation candidates retrieve the gold relation for most RPs") {
    val rps = okb.triples.select(col("pred").as("rp")).distinct()
    val cands = Candidates.relationCandidates(spark, rps, ckb, world.ppdb)
    val gold = okb.goldPred
    val hit = gold.join(cands,
      gold("rp") === cands("rp") && gold("gold_id") === cands("cand_id")).count()
    assert(hit.toDouble / gold.count() > 0.7,
      s"relation retrieval recall ${hit.toDouble / gold.count()}")
  }

  test("relation candidate features are bounded") {
    val rps = okb.triples.select(col("pred").as("rp")).distinct()
    val cands = Candidates.relationCandidates(spark, rps, ckb, world.ppdb)
    cands.select("f_ngram", "f_ld", "f_emb", "f_ppdb")
      .as[(Double, Double, Double, Double)].collect().foreach { case (a, b, c, d) =>
        assert(a >= 0 && a <= 1 + 1e-9)
        assert(b >= 0 && b <= 1 + 1e-9)
        assert(c >= 0 && c <= 1 + 1e-9)
        assert(d == 0.0 || d == 1.0)
      }
  }

  test("acronym mentions are retrieved via their anchor entry") {
    val acronyms = world.entities
      .flatMap(e => e.aliases.filter(_.kind == "acronym").map(a => a.text -> e.id)).toMap
    val used = world.triples.map(_.subj).filter(acronyms.contains).distinct
    if (used.nonEmpty) {
      val np = used.head
      val rows = entityCands.filter(col("np") === np)
        .select("cand_id").as[Long].collect().toSet
      assert(rows.contains(acronyms(np)))
    }
  }
}
