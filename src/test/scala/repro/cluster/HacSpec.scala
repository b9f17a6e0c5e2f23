package repro.cluster

import org.scalatest.funsuite.AnyFunSuite

class HacSpec extends AnyFunSuite {

  private def groupsOf(assign: Map[String, Long]): Set[Set[String]] =
    assign.groupBy(_._2).values.map(_.keySet).toSet

  test("no pairs above threshold leaves singletons") {
    val a = Hac.cluster(Seq("a", "b", "c"), Seq(("a", "b", 0.2)), threshold = 0.5)
    assert(groupsOf(a) == Set(Set("a"), Set("b"), Set("c")))
  }

  test("one strong pair merges") {
    val a = Hac.cluster(Seq("a", "b", "c"), Seq(("a", "b", 0.9)), 0.5)
    assert(groupsOf(a) == Set(Set("a", "b"), Set("c")))
  }

  test("chain merges transitively when average linkage allows") {
    val a = Hac.cluster(Seq("a", "b", "c"),
      Seq(("a", "b", 0.9), ("b", "c", 0.9), ("a", "c", 0.9)), 0.5)
    assert(groupsOf(a) == Set(Set("a", "b", "c")))
  }

  test("average linkage blocks a merge diluted by missing pairs") {
    // a-b strong; c similar to b only; after (a,b) merge,
    // avg(ab, c) = 0.6/2 = 0.3 < 0.5 -> c stays out
    val a = Hac.cluster(Seq("a", "b", "c"),
      Seq(("a", "b", 0.9), ("b", "c", 0.6)), 0.5)
    assert(groupsOf(a) == Set(Set("a", "b"), Set("c")))
  }

  test("average linkage admits a member similar to both") {
    val a = Hac.cluster(Seq("a", "b", "c"),
      Seq(("a", "b", 0.9), ("b", "c", 0.7), ("a", "c", 0.7)), 0.5)
    assert(groupsOf(a) == Set(Set("a", "b", "c")))
  }

  test("two separate components stay separate") {
    val a = Hac.cluster(Seq("a", "b", "c", "d"),
      Seq(("a", "b", 0.9), ("c", "d", 0.9)), 0.5)
    assert(groupsOf(a) == Set(Set("a", "b"), Set("c", "d")))
  }

  test("elements missing from pair list become singletons") {
    val a = Hac.cluster(Seq("a", "b", "x"), Seq(("a", "b", 0.8)), 0.5)
    assert(a.contains("x"))
    assert(groupsOf(a).contains(Set("x")))
  }

  test("zero or negative similarities are ignored") {
    val a = Hac.cluster(Seq("a", "b"), Seq(("a", "b", 0.0)), 0.5)
    assert(groupsOf(a) == Set(Set("a"), Set("b")))
  }

  test("pairs about unknown elements are ignored") {
    val a = Hac.cluster(Seq("a", "b"), Seq(("a", "zz", 0.99)), 0.5)
    assert(groupsOf(a) == Set(Set("a"), Set("b")))
  }

  test("deterministic across runs") {
    val elems = (0 until 30).map(i => s"e$i")
    val rng = new scala.util.Random(5)
    val sims = for (i <- 0 until 30; j <- i + 1 until 30 if rng.nextDouble() < 0.2)
      yield (s"e$i", s"e$j", rng.nextDouble())
    val a1 = Hac.cluster(elems, sims, 0.5)
    val a2 = Hac.cluster(elems, sims, 0.5)
    assert(a1 == a2)
  }

  test("higher threshold produces no fewer clusters") {
    val elems = (0 until 20).map(i => s"e$i")
    val rng = new scala.util.Random(7)
    val sims = for (i <- 0 until 20; j <- i + 1 until 20 if rng.nextDouble() < 0.3)
      yield (s"e$i", s"e$j", rng.nextDouble())
    val lo = groupsOf(Hac.cluster(elems, sims, 0.3)).size
    val hi = groupsOf(Hac.cluster(elems, sims, 0.8)).size
    assert(hi >= lo)
  }

  test("duplicate similarity entries accumulate (documented behavior)") {
    // the same pair listed twice doubles its cross-pair sum
    val once = Hac.cluster(Seq("a", "b"), Seq(("a", "b", 0.3)), 0.5)
    val twice = Hac.cluster(Seq("a", "b"), Seq(("a", "b", 0.3), ("a", "b", 0.3)), 0.5)
    assert(groupsOf(once) == Set(Set("a"), Set("b")))
    assert(groupsOf(twice) == Set(Set("a", "b")))
  }
}
