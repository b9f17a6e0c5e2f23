package repro.core

import repro.SparkSpec
import repro.core.Model._
import repro.synth.{OkbGen, WorldConfig}

class GraphBuilderSpec extends SparkSpec {
  import spark.implicits._

  private lazy val world = OkbGen.generate(WorldConfig.reverb45kLite(0.08))
  private lazy val okb = world.okbDf(spark)
  private lazy val ckb = world.ckbDf(spark)
  private lazy val side = GraphBuilder.SideInfo(world.ppdb, world.kbp)
  private lazy val graph = GraphBuilder.build(spark, okb, ckb, side)
  private lazy val vars = graph.vars.collect()
  private lazy val factors = graph.factors.collect()

  test("one linking variable per distinct mention per slot") {
    val nSubj = world.triples.map(_.subj).distinct.size
    val nPred = world.triples.map(_.pred).distinct.size
    val nObj = world.triples.map(_.obj).distinct.size
    assert(graph.mentions.count() == nSubj + nPred + nObj)
  }

  test("variable ids are unique") {
    assert(vars.map(_.id).distinct.length == vars.length)
  }

  test("factor ids are unique") {
    assert(factors.map(_.id).distinct.length == factors.length)
  }

  test("every factor neighbor exists") {
    val ids = vars.map(_.id).toSet
    factors.foreach(f => f.vars.foreach(v => assert(ids(v), s"missing var $v of ${f.family}")))
  }

  test("factor domains match their variables") {
    val dom = vars.map(v => v.id -> v.domain).toMap
    factors.foreach { f =>
      f.vars.zip(f.domains).foreach { case (v, d) => assert(dom(v) == d) }
      assert(f.feats.length == f.domains.product)
    }
  }

  test("linking variables have NIL as state 0 with zero features") {
    vars.filter(v => Set(Family.F4, Family.F5, Family.F6).contains(v.family)).foreach { v =>
      assert(v.states(0) == -1L)
      assert(v.feats(0).forall(_ == 0.0))
      assert(v.states.length == v.domain)
    }
  }

  test("pair variables are binary with complementary feature rows") {
    vars.filter(v => Set(Family.F1, Family.F2, Family.F3).contains(v.family)).foreach { v =>
      assert(v.domain == 2)
      v.feats(0).zip(v.feats(1)).foreach { case (a, b) =>
        assert(math.abs(a + b - 1.0) < 1e-9)
      }
    }
  }

  test("subject link var gold points at the gold entity when retrieved") {
    val goldMap = world.triples.map(t => t.subj -> t.subjE).toMap
    val mentionVar = graph.mentions.filter($"slot" === "subj")
      .as[(String, String, Long)].collect().map { case (_, t, id) => id -> t }.toMap
    vars.filter(v => v.family == Family.F4).foreach { v =>
      val text = mentionVar(v.id)
      val gold = goldMap(text)
      if (v.gold > 0) assert(v.states(v.gold) == gold, s"np $text")
      else if (v.gold == 0) assert(!v.states.contains(gold), s"np $text gold should be missing")
    }
  }

  test("pair var gold encodes gold-cluster agreement") {
    val goldMap = world.triples.map(t => t.subj -> t.subjE).toMap
    val pairRows = graph.pairs.filter($"slot" === "subj")
      .as[(String, String, String, Long)].collect()
    val varGold = vars.map(v => v.id -> v.gold).toMap
    pairRows.foreach { case (_, p1, p2, id) =>
      val expect = if (goldMap(p1) == goldMap(p2)) 1 else 0
      assert(varGold(id) == expect, s"pair ($p1, $p2)")
    }
  }

  test("one U4 factor per OIE triple") {
    assert(factors.count(_.family == Family.U4) == world.cfg.nOkbTriples)
  }

  test("one consistency factor per blocked pair") {
    val nPairs = graph.pairs.count()
    val nCons = factors.count(f => Set(Family.U5, Family.U6, Family.U7).contains(f.family))
    assert(nCons == nPairs)
  }

  test("U4 feature tables mark exactly the CKB facts") {
    val stateOf = vars.map(v => v.id -> v.states).toMap
    factors.filter(_.family == Family.U4).take(20).foreach { f =>
      val Array(sv, pv, ov) = f.vars
      val ss = stateOf(sv); val ps = stateOf(pv); val os = stateOf(ov)
      var c = 0
      for (i <- ss.indices; j <- ps.indices; k <- os.indices) {
        val isFact = ss(i) >= 0 && ps(j) >= 0 && os(k) >= 0 &&
          world.ckbFacts((ss(i), ps(j), os(k)))
        assert(f.feats(c)(0) == Scores.inclusion(isFact))
        c += 1
      }
    }
  }

  test("consistency feature tables follow the u5 definition") {
    val stateOf = vars.map(v => v.id -> v.states).toMap
    factors.filter(_.family == Family.U5).take(20).foreach { f =>
      val Array(v1, v2, pv) = f.vars
      val s1 = stateOf(v1); val s2 = stateOf(v2)
      var c = 0
      for (i <- s1.indices; j <- s2.indices; x <- 0 until 2) {
        assert(f.feats(c)(0) == Scores.consistency(s1(i), s2(j), x))
        c += 1
      }
    }
  }

  test("transitive factors connect three pair variables of one slot") {
    val fams = vars.map(v => v.id -> v.family).toMap
    factors.filter(_.family == Family.U1).take(20).foreach { f =>
      assert(f.vars.length == 3)
      f.vars.foreach(v => assert(fams(v) == Family.F1))
      assert(f.domains.forall(_ == 2))
    }
  }

  test("CanoOnly variant has no linking vars or linking factors") {
    val g = GraphBuilder.build(spark, okb, ckb, side,
      GraphBuilder.Config(variant = GraphBuilder.CanoOnly))
    val fams = g.vars.collect().map(_.family).toSet
    assert(fams.subsetOf(Set(Family.F1, Family.F2, Family.F3)))
    val ffams = g.factors.collect().map(_.family).toSet
    assert(ffams.subsetOf(Set(Family.U1, Family.U2, Family.U3)))
  }

  test("LinkOnly variant has no pair vars or consistency factors") {
    val g = GraphBuilder.build(spark, okb, ckb, side,
      GraphBuilder.Config(variant = GraphBuilder.LinkOnly))
    val fams = g.vars.collect().map(_.family).toSet
    assert(fams.subsetOf(Set(Family.F4, Family.F5, Family.F6)))
    val ffams = g.factors.collect().map(_.family).toSet
    assert(ffams == Set(Family.U4) || ffams.isEmpty)
  }

  test("graph construction is deterministic") {
    val g2 = GraphBuilder.build(spark, okb, ckb, side)
    val v1 = vars.sortBy(_.id).map(v => (v.id, v.domain, v.gold, v.states.toVector))
    val v2 = g2.vars.collect().sortBy(_.id).map(v => (v.id, v.domain, v.gold, v.states.toVector))
    assert(v1.toVector == v2.toVector)
  }
}
