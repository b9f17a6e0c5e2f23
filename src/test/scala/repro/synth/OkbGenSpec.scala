package repro.synth

import repro.SparkSpec

class OkbGenSpec extends SparkSpec {

  private lazy val cfg = WorldConfig.reverb45kLite(0.1)
  private lazy val world = OkbGen.generate(cfg)

  test("generation is deterministic in the seed") {
    val w2 = OkbGen.generate(cfg)
    assert(world.triples == w2.triples)
    assert(world.ckbFacts == w2.ckbFacts)
    assert(world.ppdb == w2.ppdb)
  }

  test("different seeds give different worlds") {
    val w2 = OkbGen.generate(cfg.copy(seed = 123L))
    assert(world.triples != w2.triples)
  }

  test("entity count matches config") {
    assert(world.entities.size == cfg.nEntities)
  }

  test("triple count matches config") {
    assert(world.triples.size == cfg.nOkbTriples)
  }

  test("canonical names are unique") {
    val names = world.entities.map(_.name)
    assert(names.distinct.size == names.size)
  }

  test("every entity has canonical, synswap and drop aliases") {
    world.entities.foreach { e =>
      val kinds = e.aliases.map(_.kind).toSet
      assert(Set("canonical", "synswap", "drop").subsetOf(kinds))
    }
  }

  test("anchor counts are positive") {
    world.entities.foreach(_.aliases.foreach(a => assert(a.anchorCount >= 1)))
  }

  test("popularity decreases with entity rank") {
    val pops = world.entities.map(_.pop)
    assert(pops == pops.sortBy(-_))
  }

  test("a surface NP string maps to exactly one gold entity") {
    val bySubj = world.triples.map(t => t.subj -> t.subjE)
    val byObj = world.triples.map(t => t.obj -> t.objE)
    (bySubj ++ byObj).groupBy(_._1).foreach { case (np, golds) =>
      assert(golds.map(_._2).distinct.size == 1, s"ambiguous NP in OKB: $np")
    }
  }

  test("a surface RP string maps to exactly one gold relation") {
    world.triples.map(t => t.pred -> t.relId).groupBy(_._1).foreach { case (rp, golds) =>
      assert(golds.map(_._2).distinct.size == 1, s"ambiguous RP in OKB: $rp")
    }
  }

  test("every OKB gold entity exists in the CKB entity set") {
    val ids = world.entities.map(_.id).toSet
    world.triples.foreach { t => assert(ids(t.subjE) && ids(t.objE)) }
  }

  test("CKB fact coverage is in the configured ballpark") {
    val okbFacts = world.triples.map(t => (t.subjE, t.relId, t.objE)).distinct
    val covered = okbFacts.count(world.ckbFacts)
    val rate = covered.toDouble / okbFacts.size
    assert(rate > cfg.ckbFactCoverage - 0.2 && rate < cfg.ckbFactCoverage + 0.2,
      s"coverage $rate vs configured ${cfg.ckbFactCoverage}")
  }

  test("clean world has full CKB coverage of OKB facts") {
    val w = OkbGen.generate(WorldConfig.clean())
    val okbFacts = w.triples.map(t => (t.subjE, t.relId, t.objE)).distinct
    assert(okbFacts.forall(w.ckbFacts))
  }

  test("validation and test triples partition the OKB") {
    val v = world.validationTriples.map(_.id).toSet
    val t = world.testTriples.map(_.id).toSet
    assert((v & t).isEmpty)
    assert(v.size + t.size == world.triples.size)
    assert(v.nonEmpty && t.nonEmpty)
  }

  test("validation split is roughly 20% of subject entities") {
    val ve = world.validationEntities
    val frac = ve.size.toDouble / world.entities.size
    assert(frac > 0.05 && frac < 0.4, s"validation fraction $frac")
  }

  test("ppdb groups put canonical aliases of one entity together") {
    // for every entity with >= 2 covered aliases, those aliases share a group
    val clean = OkbGen.generate(WorldConfig.clean())
    clean.entities.foreach { e =>
      val groups = e.aliases.flatMap(a => clean.ppdb.get(a.text)).distinct
      assert(groups.size <= 1, s"entity ${e.id} aliases split across ppdb groups")
    }
  }

  test("kbp in the clean world maps every paraphrase to its relation") {
    val clean = OkbGen.generate(WorldConfig.clean())
    clean.relations.foreach { r =>
      r.paraphrases.foreach { p =>
        val key = repro.text.StringSim.morphNormalize(p)
        assert(clean.kbp.get(key).contains(r.id))
      }
    }
  }

  test("relations have five paraphrase templates") {
    world.relations.foreach(r => assert(r.paraphrases.size == 5))
  }

  test("nyt preset is noisier than reverb preset") {
    val n = WorldConfig.nytimes2018Lite()
    val r = WorldConfig.reverb45kLite()
    assert(n.typoRate > r.typoRate)
    assert(n.ckbFactCoverage < r.ckbFactCoverage)
    assert(n.popZipfAlpha < r.popZipfAlpha)
  }

  test("okbDf tables round-trip the triples") {
    val df = world.okbDf(spark)
    assert(df.triples.count() == world.triples.size)
    assert(df.goldSubj.count() == world.triples.map(_.subj).distinct.size)
    assert(df.goldPred.count() == world.triples.map(_.pred).distinct.size)
    assert(df.goldObj.count() == world.triples.map(_.obj).distinct.size)
  }

  test("ckbDf facts match the generated fact set") {
    val df = world.ckbDf(spark)
    assert(df.facts.count() == world.ckbFacts.size)
  }

  test("alias index contains ambiguous surface forms (drop-alias collisions)") {
    val aliasOwners = world.entities
      .flatMap(e => e.aliases.map(a => a.text -> e.id))
      .groupBy(_._1)
      .map { case (a, owners) => a -> owners.map(_._2).distinct.size }
    assert(aliasOwners.values.exists(_ > 1),
      "expected at least one anchor surface form shared by several entities")
  }
}
