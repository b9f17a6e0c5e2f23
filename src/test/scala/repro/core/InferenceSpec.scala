package repro.core

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.core.Model._

/** Conflict-resolution / decoding tests over hand-built graphs and beliefs. */
class InferenceSpec extends SparkSpec {
  import spark.implicits._

  /** Build a tiny decode scenario: mentions with linking vars (domain =
    * states.length), pair vars, and explicit beliefs.
    */
  private def decodeWith(
      mentions: Seq[(String, String, Long)],
      states: Map[Long, Array[Long]],
      pairs: Seq[(String, String, String, Long)],
      beliefs: Map[Long, Array[Double]],
      triples: Seq[(Long, String, String, String)],
  ): Map[String, Inference.SlotResult] = {
    val vars = (states.map { case (id, sts) =>
      VarNode(id, sts.length, Family.F4,
        Array.fill(sts.length)(Array(0.0, 0.0, 0.0)), sts, -1)
    } ++ pairs.map { case (_, _, _, id) =>
      VarNode(id, 2, Family.F1, Array(Array(0.0, 0.0, 0.0), Array(1.0, 1.0, 1.0)),
        Array(0L, 1L), -1)
    }).toSeq.toDS()

    val graph = GraphBuilder.BuiltGraph(
      vars = vars,
      factors = spark.emptyDataset[FactorNode],
      mentions = mentions.toDF("slot", "text", "var_id"),
      pairs = pairs.toDF("slot", "p1", "p2", "var_id"),
    )
    val beliefDf = beliefs.toSeq.map { case (id, b) => (id, b) }.toDF("var_id", "belief")
    val okb = repro.synth.OkbDf(
      triples = triples.toDF("triple_id", "subj", "pred", "obj"),
      goldSubj = Seq.empty[(String, Long)].toDF("np", "gold_id"),
      goldPred = Seq.empty[(String, Long)].toDF("rp", "gold_id"),
      goldObj = Seq.empty[(String, Long)].toDF("np", "gold_id"),
    )
    Inference.decode(spark, okb, graph, beliefDf)
  }

  test("argmax linking decision decodes the external id") {
    val res = decodeWith(
      mentions = Seq(("subj", "a", 1L)),
      states = Map(1L -> Array(-1L, 7L, 8L)),
      pairs = Nil,
      beliefs = Map(1L -> Array(0.1, 0.2, 0.7)),
      triples = Seq((0L, "a", "p", "x")),
    )
    val links = res("subj").links.as[(String, Option[Long])].collect().toMap
    assert(links("a").contains(8L))
  }

  test("NIL argmax leaves the mention unlinked") {
    val res = decodeWith(
      mentions = Seq(("subj", "a", 1L)),
      states = Map(1L -> Array(-1L, 7L)),
      pairs = Nil,
      beliefs = Map(1L -> Array(0.8, 0.2)),
      triples = Seq((0L, "a", "p", "x")),
    )
    val links = res("subj").links.as[(String, Option[Long])].collect().toMap
    assert(links("a").isEmpty)
  }

  test("accepted pair merges the smaller linking group into the larger") {
    // a, b -> e1; c -> e2; pair (b, c) accepted => c joins e1
    val res = decodeWith(
      mentions = Seq(("subj", "a", 1L), ("subj", "b", 2L), ("subj", "c", 3L)),
      states = Map(1L -> Array(-1L, 1L), 2L -> Array(-1L, 1L), 3L -> Array(-1L, 2L)),
      pairs = Seq(("subj", "b", "c", 10L)),
      beliefs = Map(
        1L -> Array(0.1, 0.9), 2L -> Array(0.1, 0.9), 3L -> Array(0.2, 0.8),
        10L -> Array(0.2, 0.8)),
      triples = Seq((0L, "a", "p", "x"), (1L, "b", "p", "x"), (2L, "c", "p", "x")),
    )
    val clusters = res("subj").clusters.as[(String, String)].collect().toMap
    assert(clusters("a") == clusters("b") && clusters("b") == clusters("c"))
    val links = res("subj").links.as[(String, Option[Long])].collect().toMap
    assert(links("c").contains(1L), "c should be relabeled to the larger group's entity")
  }

  test("rejected pair leaves linking groups intact") {
    val res = decodeWith(
      mentions = Seq(("subj", "b", 2L), ("subj", "c", 3L)),
      states = Map(2L -> Array(-1L, 1L), 3L -> Array(-1L, 2L)),
      pairs = Seq(("subj", "b", "c", 10L)),
      beliefs = Map(2L -> Array(0.1, 0.9), 3L -> Array(0.2, 0.8),
        10L -> Array(0.7, 0.3)),
      triples = Seq((0L, "b", "p", "x"), (1L, "c", "p", "x")),
    )
    val clusters = res("subj").clusters.as[(String, String)].collect().toMap
    assert(clusters("b") != clusters("c"))
  }

  test("NIL mentions cluster through accepted pairs") {
    val res = decodeWith(
      mentions = Seq(("subj", "a", 1L), ("subj", "b", 2L)),
      states = Map(1L -> Array(-1L), 2L -> Array(-1L)),
      pairs = Seq(("subj", "a", "b", 10L)),
      beliefs = Map(1L -> Array(1.0), 2L -> Array(1.0), 10L -> Array(0.1, 0.9)),
      triples = Seq((0L, "a", "p", "x"), (1L, "b", "p", "x")),
    )
    val clusters = res("subj").clusters.as[(String, String)].collect().toMap
    assert(clusters("a") == clusters("b"))
    val links = res("subj").links.as[(String, Option[Long])].collect().toMap
    assert(links("a").isEmpty && links("b").isEmpty)
  }

  test("mentions without any variable become NIL singletons") {
    val res = decodeWith(
      mentions = Nil,
      states = Map.empty,
      pairs = Nil,
      beliefs = Map.empty,
      triples = Seq((0L, "lonely", "p", "x")),
    )
    val clusters = res("subj").clusters.as[(String, String)].collect().toMap
    assert(clusters.contains("lonely"))
    val links = res("subj").links.as[(String, Option[Long])].collect().toMap
    assert(links("lonely").isEmpty)
  }

  test("merging cascades transitively across groups") {
    // chain: a->e1 (size 1), b->e2 (size 1), c->e3 (size 1)
    // accepted pairs (a,b) then (b,c) -> all three end in one group
    val res = decodeWith(
      mentions = Seq(("subj", "a", 1L), ("subj", "b", 2L), ("subj", "c", 3L)),
      states = Map(1L -> Array(-1L, 1L), 2L -> Array(-1L, 2L), 3L -> Array(-1L, 3L)),
      pairs = Seq(("subj", "a", "b", 10L), ("subj", "b", "c", 11L)),
      beliefs = Map(
        1L -> Array(0.1, 0.9), 2L -> Array(0.1, 0.9), 3L -> Array(0.1, 0.9),
        10L -> Array(0.05, 0.95), 11L -> Array(0.1, 0.9)),
      triples = Seq((0L, "a", "p", "x"), (1L, "b", "p", "x"), (2L, "c", "p", "x")),
    )
    val clusters = res("subj").clusters.as[(String, String)].collect().toMap
    assert(Set(clusters("a"), clusters("b"), clusters("c")).size == 1)
  }

  test("slots are decoded independently") {
    val res = decodeWith(
      mentions = Seq(("subj", "a", 1L), ("obj", "a", 2L)),
      states = Map(1L -> Array(-1L, 1L), 2L -> Array(-1L, 2L)),
      pairs = Nil,
      beliefs = Map(1L -> Array(0.1, 0.9), 2L -> Array(0.1, 0.9)),
      triples = Seq((0L, "a", "p", "a")),
    )
    val subjLinks = res("subj").links.as[(String, Option[Long])].collect().toMap
    val objLinks = res("obj").links.as[(String, Option[Long])].collect().toMap
    assert(subjLinks("a").contains(1L))
    assert(objLinks("a").contains(2L))
  }
}
