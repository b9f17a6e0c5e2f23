package repro.cluster

import org.apache.spark.sql.DataFrame

import repro.SparkSpec

class ConnectedComponentsSpec extends SparkSpec {
  import spark.implicits._

  private def cc(vertices: Seq[Long], edges: Seq[(Long, Long)]): Map[Long, Long] = {
    val v: DataFrame = vertices.toDF("id")
    val e: DataFrame = edges.toDF("src", "dst")
    ConnectedComponents.run(spark, v, e)
      .as[(Long, Long)].collect().toMap
  }

  /** Driver-side union-find oracle. */
  private def ufOracle(vertices: Seq[Long], edges: Seq[(Long, Long)]): Map[Long, Set[Long]] = {
    val parent = scala.collection.mutable.Map(vertices.map(v => v -> v): _*)
    def find(x: Long): Long = if (parent(x) == x) x else { val r = find(parent(x)); parent(x) = r; r }
    edges.foreach { case (a, b) => parent(find(a)) = find(b) }
    vertices.groupBy(find).map { case (_, vs) => vs.min -> vs.toSet }
  }

  test("isolated vertices are their own component") {
    val m = cc(Seq(1, 2, 3), Seq.empty)
    assert(m == Map(1L -> 1L, 2L -> 2L, 3L -> 3L))
  }

  test("single edge joins two vertices") {
    val m = cc(Seq(1, 2, 3), Seq((1L, 2L)))
    assert(m(1) == m(2) && m(3) != m(1))
  }

  test("component label is the minimum vertex id") {
    val m = cc(Seq(5, 9, 7), Seq((9L, 5L), (7L, 9L)))
    assert(m.values.toSet == Set(5L))
  }

  test("chain collapses to one component") {
    val n = 12L
    val m = cc(1L to n, (1L until n).map(i => (i, i + 1)))
    assert(m.values.toSet == Set(1L))
  }

  test("direction of edges is irrelevant") {
    val a = cc(Seq(1, 2, 3), Seq((3L, 1L), (2L, 3L)))
    val b = cc(Seq(1, 2, 3), Seq((1L, 3L), (3L, 2L)))
    assert(a == b)
  }

  test("two components stay apart") {
    val m = cc(Seq(1, 2, 10, 11), Seq((1L, 2L), (10L, 11L)))
    assert(m(1) == m(2) && m(10) == m(11) && m(1) != m(10))
  }

  test("self loops are harmless") {
    val m = cc(Seq(1, 2), Seq((1L, 1L), (1L, 2L)))
    assert(m(1) == m(2))
  }

  test("random graphs agree with a union-find oracle") {
    val rng = new scala.util.Random(11)
    for (round <- 0 until 3) {
      val n = 30 + round * 20
      val vertices = (1L to n.toLong).toSeq
      val edges = Seq.fill(n / 2)((rng.nextInt(n) + 1L, rng.nextInt(n) + 1L))
      val got = cc(vertices, edges).groupBy(_._2).map { case (c, m) => c -> m.keySet }
      val want = ufOracle(vertices, edges)
      assert(got == want, s"round $round")
    }
  }
}
