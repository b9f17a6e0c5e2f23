package repro.synth

import scala.collection.mutable
import scala.util.Random

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.text.StringSim

/** Configuration of a synthetic OKB + CKB world.
  *
  * Two presets mirror the paper's data sets (scaled ~10x down so the whole
  * pipeline — including loopy BP — runs on `local[*]` in CI time):
  * `reverb45kLite` (cleaner, popularity-informative, high CKB coverage) and
  * `nytimes2018Lite` (noisier on every axis, which reproduces the paper's
  * shape of sharply lower linking accuracy and more fragmented clusters).
  */
final case class WorldConfig(
    name: String,
    nEntities: Int,
    nRelations: Int,
    nOkbTriples: Int,
    /** P(an OKB world fact is present in the CKB) — drives U4. */
    ckbFactCoverage: Double,
    /** distractor CKB facts as a multiple of the world fact pool. */
    extraCkbFactFactor: Double,
    typoRate: Double,
    acronymRate: Double,
    tenseRate: Double,
    modifierRate: Double,
    /** zipf exponent of entity popularity (smaller = flatter = less informative prior). */
    popZipfAlpha: Double,
    /** relative noise on anchor counts. */
    anchorNoise: Double,
    ppdbCoverage: Double,
    ppdbCorruption: Double,
    kbpAccuracy: Double,
    /** controls how many entities share a distinguishing concept (ambiguity). */
    ambiguousAliasFraction: Double,
    /** average number of entities sharing one acronym surface (<=1 = unique).
      * Acronyms are the hardest mentions: no string/embedding signal, only
      * popularity and joint (fact/consistency) signals can resolve them.
      */
    acronymShare: Double,
    /** P(a non-canonical alias is missing from the anchor index) — models
      * surface forms that never appear as Wikipedia anchors.
      */
    anchorDropout: Double,
    seed: Long,
)

object WorldConfig {

  /** ReVerb45K stand-in; `scale = 1.0` ≈ 4K triples / 400 entities. */
  def reverb45kLite(scale: Double = 1.0): WorldConfig = WorldConfig(
    name = "reverb45k-lite",
    nEntities = math.max(24, (400 * scale).toInt),
    nRelations = math.max(8, (60 * scale).toInt),
    nOkbTriples = math.max(80, (4000 * scale).toInt),
    ckbFactCoverage = 0.65,
    extraCkbFactFactor = 1.5,
    typoRate = 0.12,
    acronymRate = 0.45,
    tenseRate = 0.25,
    modifierRate = 0.15,
    popZipfAlpha = 0.85,
    anchorNoise = 0.45,
    ppdbCoverage = 0.6,
    ppdbCorruption = 0.03,
    kbpAccuracy = 0.7,
    ambiguousAliasFraction = 0.5,
    acronymShare = 4.0,
    anchorDropout = 0.12,
    seed = 42L,
  )

  /** NYTimes2018 stand-in: noisier knobs across the board. */
  def nytimes2018Lite(scale: Double = 1.0): WorldConfig = WorldConfig(
    name = "nytimes2018-lite",
    nEntities = math.max(24, (350 * scale).toInt),
    nRelations = math.max(8, (50 * scale).toInt),
    nOkbTriples = math.max(80, (3000 * scale).toInt),
    ckbFactCoverage = 0.35,
    extraCkbFactFactor = 2.0,
    typoRate = 0.2,
    acronymRate = 0.55,
    tenseRate = 0.35,
    modifierRate = 0.25,
    popZipfAlpha = 0.5,
    anchorNoise = 0.8,
    ppdbCoverage = 0.45,
    ppdbCorruption = 0.06,
    kbpAccuracy = 0.55,
    ambiguousAliasFraction = 0.6,
    acronymShare = 5.0,
    anchorDropout = 0.35,
    seed = 7L,
  )

  /** Noise-free world: JOCL must recover gold exactly (used by e2e tests). */
  def clean(nEntities: Int = 30, nRelations: Int = 6, nTriples: Int = 120, seed: Long = 11L): WorldConfig =
    WorldConfig("clean", nEntities, nRelations, nTriples,
      ckbFactCoverage = 1.0, extraCkbFactFactor = 0.5,
      typoRate = 0.0, acronymRate = 0.0, tenseRate = 0.0, modifierRate = 0.0,
      popZipfAlpha = 1.0, anchorNoise = 0.0,
      ppdbCoverage = 1.0, ppdbCorruption = 0.0, kbpAccuracy = 1.0,
      ambiguousAliasFraction = 0.0, acronymShare = 0.0, anchorDropout = 0.0,
      seed = seed)
}

final case class AliasSpec(text: String, kind: String, anchorCount: Long,
                           inAnchorIndex: Boolean = true)

final case class EntitySpec(id: Long, name: String, pop: Double, aliases: Vector[AliasSpec])

final case class RelationSpec(id: Long, name: String,
                              paraphrases: Vector[String], ckbAliases: Vector[String])

/** One OIE triple with its gold entity / relation ids. */
final case class OkbTriple(id: Long, subj: String, pred: String, obj: String,
                           subjE: Long, relId: Long, objE: Long)

/** The full generated world: CKB + OKB + side resources, driver-side.
  * Convert to DataFrames with [[World#ckbDf]] / [[World#okbDf]].
  */
final case class World(
    cfg: WorldConfig,
    entities: Vector[EntitySpec],
    relations: Vector[RelationSpec],
    ckbFacts: Set[(Long, Long, Long)],
    triples: Vector[OkbTriple],
    /** raw surface phrase -> paraphrase group id (PPDB 2.0 stand-in). */
    ppdb: Map[String, Long],
    /** morph-normalized RP -> relation category (Stanford KBP stand-in). */
    kbp: Map[String, Long],
) {

  def entityById: Map[Long, EntitySpec] = entities.map(e => e.id -> e).toMap

  /** 20% of entities (seeded) — the paper's validation split key. */
  def validationEntities: Set[Long] = {
    val r = new Random(cfg.seed ^ 0x5eedL)
    entities.filter(_ => r.nextDouble() < 0.2).map(_.id).toSet
  }

  def validationTriples: Vector[OkbTriple] = {
    val v = validationEntities
    triples.filter(t => v(t.subjE))
  }

  def testTriples: Vector[OkbTriple] = {
    val v = validationEntities
    triples.filterNot(t => v(t.subjE))
  }

  /** CKB tables: entities, aliases (= Wikipedia anchor stats), relations,
    * relation aliases, facts.
    */
  def ckbDf(spark: SparkSession): CkbDf = {
    import spark.implicits._
    CkbDf(
      entities = entities.map(e => (e.id, e.name, e.pop)).toDF("entity_id", "name", "pop"),
      aliases = entities
        .flatMap(e => e.aliases.filter(_.inAnchorIndex)
          .map(a => (a.text, e.id, a.anchorCount, a.kind)))
        .toDF("alias", "entity_id", "anchor_count", "kind"),
      relations = relations.map(r => (r.id, r.name)).toDF("rel_id", "name"),
      relAliases = relations.flatMap(r => r.ckbAliases.distinct.map(a => (a, r.id)))
        .toDF("alias", "rel_id"),
      facts = ckbFacts.toSeq.sorted.toDF("fs", "fr", "fo"),
    )
  }

  /** OKB tables for a set of triples (defaults to all). */
  def okbDf(spark: SparkSession, subset: Vector[OkbTriple] = triples): OkbDf = {
    import spark.implicits._
    OkbDf(
      triples = subset.map(t => (t.id, t.subj, t.pred, t.obj))
        .toDF("triple_id", "subj", "pred", "obj"),
      goldSubj = subset.map(t => (t.subj, t.subjE)).distinct
        .toDF("np", "gold_id"),
      goldPred = subset.map(t => (t.pred, t.relId)).distinct
        .toDF("rp", "gold_id"),
      goldObj = subset.map(t => (t.obj, t.objE)).distinct
        .toDF("np", "gold_id"),
    )
  }
}

final case class CkbDf(entities: DataFrame, aliases: DataFrame, relations: DataFrame,
                       relAliases: DataFrame, facts: DataFrame)

final case class OkbDf(triples: DataFrame, goldSubj: DataFrame, goldPred: DataFrame,
                       goldObj: DataFrame)

/** Deterministic generator of the synthetic world (DESIGN.md §1.2).
  *
  * Vocabulary: content word = `"w" + (concept * 8 + variant)`; variants of a
  * concept are synonyms (shared embedding direction, distinct stems — like
  * "founder"/"creator"). Typos / tense append letters, which stemming strips
  * (`w336ed -> w336`). Acronyms are opaque tokens `acr<id>` reachable only
  * through the anchor index — the cases where only joint linking can
  * canonicalize.
  */
object OkbGen {

  private val NCatConcepts = 20
  private val DistConceptBase = 100
  private val RelConceptBase = 10000

  /** Surface word for (concept, synonym-variant). */
  def word(concept: Int, variant: Int): String = "w" + (concept * 8 + variant)

  def generate(cfg: WorldConfig): World = {
    val rng = new Random(cfg.seed)

    def zipfIndex(n: Int, alpha: Double): Int = {
      // inverse-CDF draw over 1/k^alpha ranks; exact for small n.
      val weights = Array.tabulate(n)(k => 1.0 / math.pow(k + 1.0, alpha))
      val total = weights.sum
      var u = rng.nextDouble() * total
      var i = 0
      while (i < n - 1 && u > weights(i)) { u -= weights(i); i += 1 }
      i
    }

    def noisy(base: Double): Long =
      math.max(1L, math.round(base * (1.0 + cfg.anchorNoise * (rng.nextDouble() * 2 - 1))))

    // ---- entities -------------------------------------------------------
    val nDistPool = math.max(6, (cfg.nEntities / (1.0 + 6.0 * cfg.ambiguousAliasFraction)).toInt)
    val usedCanonical = mutable.Set[String]()
    val entities = Vector.tabulate(cfg.nEntities) { i =>
      val cat = zipfIndex(NCatConcepts, 0.9)
      val ambiguous = cfg.ambiguousAliasFraction > 0.0
      // entities pick a synonym variant for their distinguishing word: two
      // entities sharing the concept with the SAME variant collide on the
      // drop alias (string-level ambiguity, "Paris"); with DIFFERENT variants
      // they are embedding-confusable but token-distinct ("Paris"/"Pariss").
      val dv = if (ambiguous && rng.nextDouble() < 0.5) 1 else 0
      var dists = Vector.empty[Int]
      var canonical = ""
      var attempts = 0
      do {
        // With ambiguity disabled every entity gets a private distinguishing
        // concept — no surface form is ever shared (e2e exact-recovery mode).
        val d1 =
          if (!ambiguous) DistConceptBase + i
          else DistConceptBase + rng.nextInt(nDistPool)
        dists = if (ambiguous && rng.nextDouble() < 0.3) {
          val d2 = DistConceptBase + rng.nextInt(nDistPool)
          if (d2 == d1) Vector(d1) else Vector(d1, d2)
        } else Vector(d1)
        canonical = (word(cat, 0) +: dists.map(word(_, dv))).mkString(" ")
        attempts += 1
      } while (usedCanonical.contains(canonical) && attempts < 50)
      // Safety valve for tiny worlds: force uniqueness with a fresh concept.
      if (usedCanonical.contains(canonical)) {
        dists = Vector(DistConceptBase + nDistPool + i)
        canonical = (word(cat, 0) +: dists.map(word(_, dv))).mkString(" ")
      }
      usedCanonical += canonical

      val pop = 10000.0 / math.pow(i + 1.0, cfg.popZipfAlpha)
      def dropped(a: AliasSpec): AliasSpec =
        if (cfg.anchorDropout > 0 && rng.nextDouble() < cfg.anchorDropout)
          a.copy(inAnchorIndex = false)
        else a
      val aliases = mutable.ArrayBuffer[AliasSpec]()
      aliases += AliasSpec(canonical, "canonical", noisy(pop)) // always indexed
      // synonym swap on the first distinguishing word
      val swapped =
        (word(cat, 0) +: (word(dists.head, (dv + 1) % 3) +: dists.tail.map(word(_, dv))))
          .mkString(" ")
      aliases += dropped(AliasSpec(swapped, "synswap", noisy(pop * 0.4)))
      // drop the (frequent) category word
      aliases += dropped(AliasSpec(dists.map(word(_, dv)).mkString(" "), "drop",
        noisy(pop * 0.5)))
      if (rng.nextDouble() < cfg.acronymRate) {
        // shared acronym surfaces ("UMD") — ~acronymShare owners per token
        val acrPool = math.max(2,
          (cfg.nEntities * cfg.acronymRate / math.max(1.0, cfg.acronymShare)).toInt)
        val acr = if (cfg.acronymShare > 1.0) "acr" + (i % acrPool) else "acr" + i
        aliases += dropped(AliasSpec(acr, "acronym", noisy(pop * 0.3)))
      }
      if (cfg.typoRate > 0) {
        val typoTok = word(dists.head, dv) + ('x' + rng.nextInt(3)).toChar
        val typo = (word(cat, 0) +: (typoTok +: dists.tail.map(word(_, dv)))).mkString(" ")
        aliases += dropped(AliasSpec(typo, "typo", noisy(math.max(1.0, pop * 0.05))))
      }
      EntitySpec(i.toLong, canonical, pop, aliases.toVector)
    }

    // ---- relations ------------------------------------------------------
    // With ambiguity on, relations come in confusable pairs: both use the
    // same verb concept with disjoint synonym variants, so their paraphrases
    // are embedding-similar but token-distinct ("founded"/"established" vs
    // "created"/"built" style confusion for relation linking).
    val relations = Vector.tabulate(cfg.nRelations) { r =>
      val confusable = cfg.ambiguousAliasFraction > 0.0
      val c = if (confusable) RelConceptBase + r / 2 else RelConceptBase + r
      val off = if (confusable && r % 2 == 1) 3 else 0
      val v0 = word(c, off); val v1 = word(c, off + 1); val v2 = word(c, off + 2)
      val paraphrases = Vector(
        s"be $v0 of",
        s"be $v1 of",
        v0,
        s"have $v1 with",
        s"be the $v2 in",
      )
      RelationSpec(r.toLong, v0, paraphrases, Vector(v0, s"be $v0 of", s"be $v2 in"))
    }

    // ---- facts ----------------------------------------------------------
    // Each world fact is rendered ~5x on average: OIE corpora are redundant
    // (many sentences assert the same fact), which is what gives AMIE its
    // (s,o)-co-occurrence signal.
    val poolSize = math.max(4, cfg.nOkbTriples / 5)
    val factPool = Vector.tabulate(poolSize) { _ =>
      val s = zipfIndex(cfg.nEntities, 0.8).toLong
      var o = zipfIndex(cfg.nEntities, 0.8).toLong
      if (o == s) o = (s + 1) % cfg.nEntities
      val r = zipfIndex(cfg.nRelations, 0.5).toLong
      (s, r, o)
    }
    val coveredFacts = factPool.filter(_ => rng.nextDouble() < cfg.ckbFactCoverage).toSet
    val nDistractors = (cfg.extraCkbFactFactor * poolSize).toInt
    val distractors = Vector.fill(nDistractors) {
      (rng.nextInt(cfg.nEntities).toLong, rng.nextInt(cfg.nRelations).toLong,
       rng.nextInt(cfg.nEntities).toLong)
    }.toSet
    val ckbFacts = coveredFacts ++ distractors

    // ---- OKB triple rendering ------------------------------------------
    // A surface string is claimed by the first entity that uses it, so the
    // per-string gold is unambiguous within the data set (ambiguity lives in
    // the anchor index, where drop-aliases of entities that share a
    // distinguishing concept collide). See DESIGN.md §2 (mention granularity).
    val claimedNp = mutable.Map[String, Long]()

    def renderNp(e: EntitySpec): String = {
      val weights: Vector[(AliasSpec, Double)] = e.aliases.map { a =>
        val w = a.kind match {
          case "canonical" => 0.30
          case "synswap"   => 0.18
          case "drop"      => 0.27
          case "acronym"   => 0.20
          case "typo"      => cfg.typoRate
        }
        (a, w)
      }
      val total = weights.map(_._2).sum
      var u = rng.nextDouble() * total
      var pick = weights.head._1
      var i = 0
      var done = false
      while (i < weights.length && !done) {
        if (u <= weights(i)._2) { pick = weights(i)._1; done = true }
        else u -= weights(i)._2
        i += 1
      }
      val owner = claimedNp.get(pick.text)
      val text =
        if (owner.isEmpty || owner.contains(e.id)) pick.text
        else e.name // canonical names are unique by construction
      claimedNp(text) = claimedNp.getOrElse(text, e.id)
      text
    }

    def renderRp(rel: RelationSpec): String = {
      val tmplWeights = Vector(0.35, 0.2, 0.15, 0.15, 0.15)
      var u = rng.nextDouble()
      var idx = 0
      while (idx < tmplWeights.length - 1 && u > tmplWeights(idx)) { u -= tmplWeights(idx); idx += 1 }
      var toks = rel.paraphrases(idx).split(" ").toVector
      if (rng.nextDouble() < cfg.tenseRate) {
        val ci = toks.indexWhere(t => t.startsWith("w") && t.length > 1 && t(1).isDigit)
        if (ci >= 0) toks = toks.updated(ci, toks(ci) + "ed")
      }
      if (rng.nextDouble() < cfg.modifierRate) {
        val ci = toks.indexWhere(t => t.startsWith("w") && t.length > 1 && t(1).isDigit)
        if (ci >= 0) toks = toks.take(ci) ++ Vector("early") ++ toks.drop(ci)
      }
      toks.mkString(" ")
    }

    val entityArr = entities.toArray
    val triples = Vector.tabulate(cfg.nOkbTriples) { t =>
      val (s, r, o) = factPool(rng.nextInt(poolSize))
      OkbTriple(t.toLong,
        renderNp(entityArr(s.toInt)), renderRp(relations(r.toInt)), renderNp(entityArr(o.toInt)),
        s, r, o)
    }

    // ---- PPDB stand-in --------------------------------------------------
    val ppdb = mutable.Map[String, Long]()
    val allGroupIds = entities.map(_.id) ++ relations.map(r => 1000000L + r.id)
    def corrupt(g: Long): Long =
      if (rng.nextDouble() < cfg.ppdbCorruption)
        allGroupIds(rng.nextInt(allGroupIds.length))
      else g
    entities.foreach { e =>
      e.aliases.foreach { a =>
        if (rng.nextDouble() < cfg.ppdbCoverage && !ppdb.contains(a.text))
          ppdb(a.text) = corrupt(e.id)
      }
    }
    relations.foreach { r =>
      (r.paraphrases ++ r.ckbAliases).distinct.foreach { p =>
        if (rng.nextDouble() < cfg.ppdbCoverage && !ppdb.contains(p))
          ppdb(p) = corrupt(1000000L + r.id)
      }
    }

    // ---- KBP stand-in ---------------------------------------------------
    val kbp = mutable.Map[String, Long]()
    relations.foreach { r =>
      r.paraphrases.foreach { p =>
        val key = StringSim.morphNormalize(p)
        val u = rng.nextDouble()
        if (u < cfg.kbpAccuracy) kbp(key) = r.id
        else if (u < cfg.kbpAccuracy + (1 - cfg.kbpAccuracy) * 0.3)
          kbp(key) = rng.nextInt(cfg.nRelations).toLong
        // else: KBP has no opinion on this RP
      }
    }

    World(cfg, entities, relations, ckbFacts, triples, ppdb.toMap, kbp.toMap)
  }
}
