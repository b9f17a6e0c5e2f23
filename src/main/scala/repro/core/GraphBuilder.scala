package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, Row, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.core.Model._
import repro.mining.Amie
import repro.synth.{CkbDf, OkbDf}

/** Assembly of the JOCL factor graph from an OKB + CKB (paper §3.1–§3.3).
  *
  * Variable nodes: one linking variable per distinct surface string per slot
  * (domain = NIL + top-K candidates) and one canonicalization variable per
  * blocked pair per slot (domain 2). Unary factors F1..F6 are the feature
  * tables of the variables (folded priors, see [[Model]]). Higher-order
  * factors: U1-U3 on pair triangles, U4 per OIE triple, U5-U7 per blocked
  * pair connecting it to its two linking variables.
  */
object GraphBuilder {

  sealed trait Variant
  case object Full extends Variant
  /** OKB canonicalization alone (Table 4's JOCL_cano). */
  case object CanoOnly extends Variant
  /** OKB linking alone (Table 4's JOCL_link). */
  case object LinkOnly extends Variant

  final case class Config(
      variant: Variant = Full,
      blocking: Blocking.Config = Blocking.Config(),
      candidates: Candidates.Config = Candidates.Config(),
      amie: Amie.Config = Amie.Config(),
      /** per-phrase cap on blocked partners. */
      maxPairsPerPhrase: Int = 25,
      /** global cap on transitive-relation triangles per slot. */
      maxTriangles: Int = 60000,
  )

  final case class SideInfo(ppdb: Map[String, Long], kbp: Map[String, Long])

  /** The built graph plus the decode tables that map node ids back to
    * surface strings.
    */
  final case class BuiltGraph(
      vars: Dataset[VarNode],
      factors: Dataset[FactorNode],
      /** columns: slot ('subj'|'pred'|'obj'), text, var_id — linking vars. */
      mentions: DataFrame,
      /** columns: slot, p1, p2, var_id — canonicalization pair vars. */
      pairs: DataFrame,
  )

  private def withIds(df: DataFrame, textCol: String, base: Long): DataFrame = {
    val w = Window.orderBy(col(textCol))
    df.select(col(textCol)).distinct()
      .withColumn("var_id", row_number().over(w).cast("long") + lit(base))
  }

  def build(spark: SparkSession, okb: OkbDf, ckb: CkbDf, side: SideInfo,
            cfg: Config = Config()): BuiltGraph = {
    import spark.implicits._

    val triples = okb.triples.cache()
    val subjects = triples.select(col("subj").as("text")).distinct()
    val preds = triples.select(col("pred").as("text")).distinct()
    val objects = triples.select(col("obj").as("text")).distinct()
    val allNps = subjects.union(objects).distinct()

    val subjIds = withIds(subjects, "text", Ids.SubjLink).cache()
    val predIds = withIds(preds, "text", Ids.PredLink).cache()
    val objIds = withIds(objects, "text", Ids.ObjLink).cache()

    val wantLink = cfg.variant != CanoOnly
    val wantCano = cfg.variant != LinkOnly
    val wantConsistency = cfg.variant == Full

    // ---- linking variables ----------------------------------------------
    val (linkVars, mentions) = if (wantLink) {
      val entCands = Candidates
        .entityCandidates(spark, allNps.withColumnRenamed("text", "np"), ckb, side.ppdb,
          cfg.candidates)
        .cache()
      val relCands = Candidates
        .relationCandidates(spark, preds.withColumnRenamed("text", "rp"), ckb, side.ppdb,
          cfg.candidates)
        .cache()

      def npLinkVars(ids: DataFrame, gold: DataFrame, family: String): Dataset[VarNode] = {
        val rows = ids
          .join(gold.withColumnRenamed("np", "text"), Seq("text"), "left")
          .join(entCands.withColumnRenamed("np", "text"), Seq("text"), "left")
          .select(col("var_id"), col("gold_id"), col("rank"), col("cand_id"),
            col("f_pop"), col("f_emb"), col("f_ppdb"))
        toLinkVars(spark, rows, family, nFeats = 3)
      }

      val sv = npLinkVars(subjIds, okb.goldSubj, Family.F4)
      val ov = npLinkVars(objIds, okb.goldObj, Family.F6)
      val pvRows = predIds
        .join(okb.goldPred.withColumnRenamed("rp", "text"), Seq("text"), "left")
        .join(relCands.withColumnRenamed("rp", "text"), Seq("text"), "left")
        .select(col("var_id"), col("gold_id"), col("rank"), col("cand_id"),
          col("f_ngram").as("f1"), col("f_ld").as("f2"),
          col("f_emb").as("f3"), col("f_ppdb").as("f4"))
      val pv = toLinkVars(spark, pvRows
        .withColumnRenamed("f1", "f_pop") // positional reuse; see toLinkVars
        , Family.F5, nFeats = 4)

      val ment = subjIds.select(lit("subj").as("slot"), col("text"), col("var_id"))
        .union(predIds.select(lit("pred").as("slot"), col("text"), col("var_id")))
        .union(objIds.select(lit("obj").as("slot"), col("text"), col("var_id")))
      (sv.union(ov).union(pv), ment)
    } else {
      (spark.emptyDataset[VarNode],
       spark.emptyDataFrame.select(lit("").as("slot"), lit("").as("text"),
         lit(0L).as("var_id")).limit(0))
    }

    // ---- canonicalization pair variables ---------------------------------
    val (pairVars, pairTables) = if (wantCano) {
      // the paraphrase dictionary participates in blocking (DESIGN.md §2):
      // acronym aliases have no other route to a pair variable
      val blockCfg = cfg.blocking.copy(ppdb = side.ppdb)
      def blocked(phrases: DataFrame, freqBase: DataFrame): DataFrame =
        Blocking.capPerPhrase(
          Blocking.pairs(spark, phrases.withColumnRenamed("text", "phrase"),
            freqBase.withColumnRenamed("text", "phrase"), blockCfg),
          cfg.maxPairsPerPhrase)

      val subjPairsRaw = blocked(subjects, allNps)
      val objPairsRaw = blocked(objects, allNps)
      val predPairsRaw = blocked(preds, preds)

      val amiePairs = Amie.equivalentRawPairs(
        triples, preds.withColumnRenamed("text", "rp"), cfg.amie)

      val subjSig = Signals.npPairSignals(subjPairsRaw, side.ppdb)
      val objSig = Signals.npPairSignals(objPairsRaw, side.ppdb)
      val predSig = Signals.rpPairSignals(predPairsRaw, side.ppdb, side.kbp, amiePairs)

      def pairIds(sig: DataFrame, base: Long): DataFrame = {
        val w = Window.orderBy(col("p1"), col("p2"))
        sig.withColumn("var_id", row_number().over(w).cast("long") + lit(base))
      }

      val sp = pairIds(subjSig, Ids.SubjPair).cache()
      val pp = pairIds(predSig, Ids.PredPair).cache()
      val op = pairIds(objSig, Ids.ObjPair).cache()

      def npPairVars(df: DataFrame, goldDf: DataFrame, family: String): Dataset[VarNode] = {
        val g1 = goldDf.select(col("np").as("p1"), col("gold_id").as("g1"))
        val g2 = goldDf.select(col("np").as("p2"), col("gold_id").as("g2"))
        df.join(g1, Seq("p1"), "left").join(g2, Seq("p2"), "left")
          .select(col("var_id"), col("f_idf"), col("f_emb"), col("f_ppdb"),
            col("g1"), col("g2"))
          .map { r =>
            val feats1 = Array(r.getDouble(1), r.getDouble(2), r.getDouble(3))
            val gold =
              if (r.isNullAt(4) || r.isNullAt(5)) -1
              else if (r.getLong(4) == r.getLong(5)) 1 else 0
            VarNode(r.getLong(0), 2, family,
              Array(feats1.map(1.0 - _), feats1), Array(0L, 1L), gold)
          }
      }

      def rpPairVars(df: DataFrame, goldDf: DataFrame): Dataset[VarNode] = {
        val g1 = goldDf.select(col("rp").as("p1"), col("gold_id").as("g1"))
        val g2 = goldDf.select(col("rp").as("p2"), col("gold_id").as("g2"))
        df.join(g1, Seq("p1"), "left").join(g2, Seq("p2"), "left")
          .select(col("var_id"), col("f_idf"), col("f_emb"), col("f_ppdb"),
            col("f_amie"), col("f_kbp"), col("g1"), col("g2"))
          .map { r =>
            val feats1 = Array(r.getDouble(1), r.getDouble(2), r.getDouble(3),
              r.getDouble(4), r.getDouble(5))
            val gold =
              if (r.isNullAt(6) || r.isNullAt(7)) -1
              else if (r.getLong(6) == r.getLong(7)) 1 else 0
            VarNode(r.getLong(0), 2, Family.F2,
              Array(feats1.map(1.0 - _), feats1), Array(0L, 1L), gold)
          }
      }

      val spv = npPairVars(sp, okb.goldSubj, Family.F1)
      val ppv = rpPairVars(pp, okb.goldPred)
      val opv = npPairVars(op, okb.goldObj, Family.F3)

      val tables = sp.select(lit("subj").as("slot"), col("p1"), col("p2"), col("var_id"))
        .union(pp.select(lit("pred").as("slot"), col("p1"), col("p2"), col("var_id")))
        .union(op.select(lit("obj").as("slot"), col("p1"), col("p2"), col("var_id")))
      (spv.union(ppv).union(opv), tables.cache())
    } else {
      (spark.emptyDataset[VarNode],
       spark.emptyDataFrame
         .select(lit("").as("slot"), lit("").as("p1"), lit("").as("p2"),
           lit(0L).as("var_id")).limit(0))
    }

    val allVars = linkVars.union(pairVars).localCheckpoint(true)

    // states arrays of linking vars, for U4/U5 feature construction
    val varStates = allVars.map(v => (v.id, v.states)).toDF("var_id", "states")

    // ---- factors ----------------------------------------------------------
    var factorParts = Vector.empty[Dataset[FactorNode]]
    var factorBase = Ids.FactorBase

    if (wantCano) {
      // transitive-relation triangles per slot
      def triangles(slot: String, family: String, base: Long): Dataset[FactorNode] = {
        val e = pairTables.filter(col("slot") === slot)
          .select(col("p1"), col("p2"), col("var_id"))
        val t = e.as("ab")
          .join(e.as("bc"), col("ab.p2") === col("bc.p1"))
          .join(e.as("ac"),
            col("ac.p1") === col("ab.p1") && col("ac.p2") === col("bc.p2"))
          .select(col("ab.var_id").as("vab"), col("bc.var_id").as("vbc"),
            col("ac.var_id").as("vac"))
          .orderBy("vab", "vbc", "vac")
          .limit(cfg.maxTriangles)
        val feats = (0 until 8).map { c =>
          val a = (c >> 2) & 1; val b = (c >> 1) & 1; val cc = c & 1
          Array(Scores.transitive(a, b, cc))
        }.toArray
        // ids via zipWithIndex on the sorted+limited set: one sort, stable ids
        val rdd = t.as[(Long, Long, Long)].rdd.zipWithIndex().map {
          case ((vab, vbc, vac), i) =>
            FactorNode(base + i, family, Array(vab, vbc, vac), Array(2, 2, 2), feats)
        }
        spark.createDataset(rdd)
      }
      factorParts :+= triangles("subj", Family.U1, factorBase); factorBase += 100000000L
      factorParts :+= triangles("pred", Family.U2, factorBase); factorBase += 100000000L
      factorParts :+= triangles("obj", Family.U3, factorBase); factorBase += 100000000L
    }

    if (wantLink) {
      // fact inclusion: one factor per OIE triple over its three link vars
      val factSet = ckb.facts.collect()
        .map(r => (r.getLong(0), r.getLong(1), r.getLong(2))).toSet
      val factB = spark.sparkContext.broadcast(factSet)

      val withVars = triples
        .join(subjIds.select(col("text").as("subj"), col("var_id").as("sv")), Seq("subj"))
        .join(predIds.select(col("text").as("pred"), col("var_id").as("pv")), Seq("pred"))
        .join(objIds.select(col("text").as("obj"), col("var_id").as("ov")), Seq("obj"))
        .join(varStates.select(col("var_id").as("sv"), col("states").as("ss")), Seq("sv"))
        .join(varStates.select(col("var_id").as("pv"), col("states").as("ps")), Seq("pv"))
        .join(varStates.select(col("var_id").as("ov"), col("states").as("os")), Seq("ov"))
        .select(col("triple_id"), col("sv"), col("pv"), col("ov"),
          col("ss"), col("ps"), col("os"))

      val base = factorBase
      factorParts :+= withVars
        .as[(Long, Long, Long, Long, Array[Long], Array[Long], Array[Long])]
        .map { case (tid, sv, pv, ov, ss, ps, os) =>
          val feats = new Array[Array[Double]](ss.length * ps.length * os.length)
          var c = 0
          var i = 0
          while (i < ss.length) {
            var j = 0
            while (j < ps.length) {
              var k = 0
              while (k < os.length) {
                val isFact = ss(i) >= 0 && ps(j) >= 0 && os(k) >= 0 &&
                  factB.value((ss(i), ps(j), os(k)))
                feats(c) = Array(Scores.inclusion(isFact))
                c += 1; k += 1
              }
              j += 1
            }
            i += 1
          }
          FactorNode(base + tid, Family.U4, Array(sv, pv, ov),
            Array(ss.length, ps.length, os.length), feats)
        }
      factorBase += 100000000L
    }

    if (wantConsistency) {
      // consistency: pair var + its two linking vars
      def consistency(slot: String, family: String, idTable: DataFrame,
                      base: Long): Dataset[FactorNode] = {
        pairTables.filter(col("slot") === slot)
          .join(idTable.select(col("text").as("p1"), col("var_id").as("v1")), Seq("p1"))
          .join(idTable.select(col("text").as("p2"), col("var_id").as("v2")), Seq("p2"))
          .join(varStates.select(col("var_id").as("v1"), col("states").as("s1")), Seq("v1"))
          .join(varStates.select(col("var_id").as("v2"), col("states").as("s2")), Seq("v2"))
          .select(col("var_id").as("pvar"), col("v1"), col("v2"),
            col("s1"), col("s2"))
          .as[(Long, Long, Long, Array[Long], Array[Long])]
          .map { case (pvar, v1, v2, s1, s2) =>
            val feats = new Array[Array[Double]](s1.length * s2.length * 2)
            var c = 0
            var i = 0
            while (i < s1.length) {
              var j = 0
              while (j < s2.length) {
                var x = 0
                while (x < 2) {
                  feats(c) = Array(Scores.consistency(s1(i), s2(j), x))
                  c += 1; x += 1
                }
                j += 1
              }
              i += 1
            }
            // factor id: derived from the pair var id (unique per slot)
            FactorNode(base + (pvar % 1000000000L), family, Array(v1, v2, pvar),
              Array(s1.length, s2.length, 2), feats)
          }
      }
      factorParts :+= consistency("subj", Family.U5, subjIds, factorBase)
      factorBase += 100000000L
      factorParts :+= consistency("pred", Family.U6, predIds, factorBase)
      factorBase += 100000000L
      factorParts :+= consistency("obj", Family.U7, objIds, factorBase)
      factorBase += 100000000L
    }

    val allFactors =
      if (factorParts.isEmpty) spark.emptyDataset[FactorNode]
      else factorParts.reduce(_ union _).localCheckpoint(true)

    BuiltGraph(allVars, allFactors, mentions.cache(), pairTables)
  }

  /** Assemble linking VarNodes from candidate rows.
    *
    * Expected columns: var_id, gold_id (nullable), rank (nullable),
    * cand_id (nullable), then `nFeats` feature columns in table order
    * (named f_pop, f_emb, f_ppdb for entities — relation rows are passed
    * positionally with the same head column name).
    */
  private def toLinkVars(spark: SparkSession, rows: DataFrame, family: String,
                         nFeats: Int): Dataset[VarNode] = {
    import spark.implicits._
    val featCols = rows.columns.drop(4)
    require(featCols.length == nFeats, s"expected $nFeats feature columns, got ${featCols.mkString(",")}")
    rows
      .groupByKey(r => r.getLong(0))
      .mapGroups { (varId: Long, it: Iterator[Row]) =>
        val rs = it.toArray
        val gold = rs.collectFirst { case r if !r.isNullAt(1) => r.getLong(1) }
        val cands = rs.filter(r => !r.isNullAt(2))
          .map { r =>
            val feats = Array.tabulate(nFeats)(i => r.getDouble(4 + i))
            (r.getInt(3 - 1), r.getLong(3), feats) // (rank, cand_id, feats)
          }
          .sortBy(_._1)
        val states = (-1L) +: cands.map(_._2)
        val feats = new Array[Double](nFeats) +: cands.map(_._3)
        val goldState = gold match {
          case Some(g) =>
            val i = states.indexOf(g)
            if (i >= 0) i else 0
          case None => -1
        }
        VarNode(varId, states.length, family, feats.toArray, states.toArray, goldState)
      }
  }
}
