package repro.eval

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}

class MetricsSpec extends SparkSpec {
  import spark.implicits._

  private def assign(rows: (String, String, String)*) =
    rows.toSeq.toDF("element", "pred_cluster", "gold_cluster")

  test("perfect clustering scores 1 everywhere") {
    val s = Metrics.clusterScores(assign(
      ("a", "p1", "g1"), ("b", "p1", "g1"), ("c", "p2", "g2")))
    assert(s.macroF1 == 1.0 && s.microF1 == 1.0 && s.pairF1 == 1.0 && s.avgF1 == 1.0)
  }

  test("all-singletons on one gold cluster: macro precision 1, recall 0") {
    val s = Metrics.clusterScores(assign(
      ("a", "p1", "g1"), ("b", "p2", "g1"), ("c", "p3", "g1")))
    assert(s.macroP == 1.0) // every predicted cluster is pure
    assert(s.macroR == 0.0) // no gold cluster is recovered whole
    assert(s.pairP == 0.0 && s.pairR == 0.0 && s.pairF1 == 0.0)
    assert(math.abs(s.microP - 1.0) < 1e-12)
    assert(math.abs(s.microR - 1.0 / 3.0) < 1e-12)
  }

  test("one big cluster over two gold clusters: macro reversed") {
    val s = Metrics.clusterScores(assign(
      ("a", "p1", "g1"), ("b", "p1", "g1"), ("c", "p1", "g2")))
    assert(s.macroP == 0.0)
    assert(s.macroR == 1.0) // both gold clusters contained in the predicted one
    assert(math.abs(s.microP - 2.0 / 3.0) < 1e-12)
    assert(s.microR == 1.0)
  }

  test("pairwise metrics match hand computation") {
    // pred: {a,b,c}, {d}; gold: {a,b}, {c,d}
    val s = Metrics.clusterScores(assign(
      ("a", "p1", "g1"), ("b", "p1", "g1"), ("c", "p1", "g2"), ("d", "p2", "g2")))
    // predicted pairs: ab, ac, bc (3); gold pairs: ab, cd (2); TP: ab (1)
    assert(math.abs(s.pairP - 1.0 / 3.0) < 1e-12)
    assert(math.abs(s.pairR - 1.0 / 2.0) < 1e-12)
  }

  test("avgF1 is the mean of the three F1s") {
    val s = Metrics.clusterScores(assign(
      ("a", "p1", "g1"), ("b", "p1", "g1"), ("c", "p1", "g2"), ("d", "p2", "g2")))
    assert(math.abs(s.avgF1 - (s.macroF1 + s.microF1 + s.pairF1) / 3) < 1e-12)
  }

  test("empty assignment scores zeros") {
    val s = Metrics.clusterScores(assign())
    assert(s.avgF1 == 0.0)
  }

  test("micro metrics via DuckDB contingency oracle") {
    val df = assign(
      ("a", "p1", "g1"), ("b", "p1", "g1"), ("c", "p1", "g2"),
      ("d", "p2", "g2"), ("e", "p2", "g3"), ("f", "p3", "g3"))
    val s = Metrics.clusterScores(df)
    // micro precision numerator: sum over pred clusters of max gold overlap
    val microNum = df.groupBy("pred_cluster", "gold_cluster").count()
      .groupBy("pred_cluster").agg(max("count").as("m"))
      .agg(sum("m").as("micro_num"))
    Oracle.assertEquivalent(
      microNum,
      """SELECT SUM(m) AS micro_num FROM (
        |  SELECT pred_cluster, MAX(n) AS m FROM (
        |    SELECT pred_cluster, gold_cluster, COUNT(*) AS n
        |    FROM assign GROUP BY pred_cluster, gold_cluster
        |  ) GROUP BY pred_cluster)""".stripMargin,
      "assign" -> df)
    // max overlaps: p1 -> 2, p2 -> 1, p3 -> 1; N = 6
    assert(math.abs(s.microP - 4.0 / 6.0) < 1e-12)
  }

  test("pairwise TP via DuckDB oracle") {
    val df = assign(
      ("a", "p1", "g1"), ("b", "p1", "g1"), ("c", "p1", "g2"), ("d", "p2", "g2"))
    val tp = df.groupBy("pred_cluster", "gold_cluster").count()
      .agg(sum(col("count") * (col("count") - 1) / 2).as("tp"))
    Oracle.assertEquivalent(
      tp,
      """SELECT SUM(n * (n - 1) / 2) AS tp FROM (
        |  SELECT pred_cluster, gold_cluster, COUNT(*) AS n
        |  FROM assign GROUP BY pred_cluster, gold_cluster)""".stripMargin,
      "assign" -> df)
  }

  test("linking accuracy counts exact matches only") {
    val links = Seq(
      (Some(1L), 1L), (Some(2L), 1L), (None, 3L), (Some(4L), 4L),
    ).toDF("pred_id", "gold_id")
    assert(math.abs(Metrics.linkingAccuracy(links) - 0.5) < 1e-12)
  }

  test("linking accuracy of empty table is 0") {
    val links = Seq.empty[(Option[Long], Long)].toDF("pred_id", "gold_id")
    assert(Metrics.linkingAccuracy(links) == 0.0)
  }

  test("linking accuracy all-null predictions is 0") {
    val links = Seq((Option.empty[Long], 1L), (Option.empty[Long], 2L))
      .toDF("pred_id", "gold_id")
    assert(Metrics.linkingAccuracy(links) == 0.0)
  }

  test("linking accuracy all correct is 1") {
    val links = Seq((Some(1L), 1L), (Some(2L), 2L)).toDF("pred_id", "gold_id")
    assert(Metrics.linkingAccuracy(links) == 1.0)
  }

  test("macro/micro/pair invariance under cluster relabeling") {
    val base = assign(("a", "p1", "g1"), ("b", "p1", "g1"), ("c", "p2", "g2"))
    val relabeled = assign(("a", "zz", "g1"), ("b", "zz", "g1"), ("c", "yy", "g2"))
    assert(Metrics.clusterScores(base) == Metrics.clusterScores(relabeled))
  }

  test("singleton-heavy clustering: micro recall below precision") {
    val s = Metrics.clusterScores(assign(
      ("a", "p1", "g1"), ("b", "p2", "g1"), ("c", "p3", "g1"), ("d", "p4", "g2")))
    assert(s.microP >= s.microR)
  }
}
