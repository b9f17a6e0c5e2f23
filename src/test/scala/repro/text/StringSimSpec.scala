package repro.text

import scala.util.Random

import org.scalatest.funsuite.AnyFunSuite

class StringSimSpec extends AnyFunSuite {
  import StringSim._

  /** Deterministic random-string samples (scalacheck-style properties
    * without the scalatest bridge artifact, which is not in the offline
    * cache).
    */
  private def samples(n: Int, seed: Long): Seq[String] = {
    val r = new Random(seed)
    Seq.fill(n)(r.alphanumeric.take(r.nextInt(10)).mkString)
  }

  // ---- tokens / stemming ----------------------------------------------

  test("tokens lowercases and splits on whitespace") {
    assert(tokens("Warren  Buffett") == Vector("warren", "buffett"))
  }

  test("tokens of empty string is empty") { assert(tokens("").isEmpty) }

  test("tokens trims repeated spaces") { assert(tokens("a   b") == Vector("a", "b")) }

  test("stem strips synthetic variant letters") { assert(stem("w336xy") == "w336") }

  test("stem keeps bare synthetic word") { assert(stem("w42") == "w42") }

  test("stem strips -ing") { assert(stem("running") == "runn") }

  test("stem strips -ed") { assert(stem("worked") == "work") }

  test("stem strips plural -s") { assert(stem("books") == "book") }

  test("stem leaves short words alone") { assert(stem("is") == "is") }

  test("morphNormalize drops stopwords and modifiers") {
    assert(morphNormalize("be early w336 of") == "w336")
  }

  test("morphNormalize keeps all-function-word phrases non-empty") {
    assert(morphNormalize("be of").nonEmpty)
  }

  test("morphNormalize collapses tense variants") {
    assert(morphNormalize("be w80000ed of") == morphNormalize("be w80000 of"))
  }

  test("contentStems drops stopwords") {
    assert(contentStems("be w336a of") == Vector("w336"))
  }

  // ---- Levenshtein -------------------------------------------------------

  test("levenshtein of identical strings is 0") { assert(levenshtein("abc", "abc") == 0) }

  test("levenshtein of empty vs s is length") { assert(levenshtein("", "abcd") == 4) }

  test("levenshtein kitten/sitting = 3") { assert(levenshtein("kitten", "sitting") == 3) }

  test("levenshtein single substitution") { assert(levenshtein("cat", "car") == 1) }

  test("levenshteinSim in [0,1] and symmetric (property)") {
    val ss = samples(60, 1)
    for (a <- ss.take(20); b <- ss.slice(20, 40)) {
      val s = levenshteinSim(a, b)
      assert(s >= 0.0 && s <= 1.0)
      assert(math.abs(s - levenshteinSim(b, a)) < 1e-12)
    }
  }

  test("levenshtein triangle inequality (property)") {
    val ss = samples(30, 2)
    for (Seq(a, b, c) <- ss.sliding(3)) {
      assert(levenshtein(a, c) <= levenshtein(a, b) + levenshtein(b, c))
    }
  }

  test("levenshteinSim of both empty is 1") { assert(levenshteinSim("", "") == 1.0) }

  // ---- Jaro-Winkler -------------------------------------------------------

  test("jaro of identical strings is 1") { assert(jaro("martha", "martha") == 1.0) }

  test("jaro martha/marhta known value") {
    assert(math.abs(jaro("martha", "marhta") - 0.944444) < 1e-4)
  }

  test("jaroWinkler martha/marhta known value") {
    assert(math.abs(jaroWinkler("martha", "marhta") - 0.961111) < 1e-4)
  }

  test("jaro dwayne/duane known value") {
    assert(math.abs(jaro("dwayne", "duane") - 0.822222) < 1e-4)
  }

  test("jaro disjoint strings is 0") { assert(jaro("abc", "xyz") == 0.0) }

  test("jaroWinkler bounded and symmetric (property)") {
    val ss = samples(60, 3)
    for (a <- ss.take(20); b <- ss.slice(20, 40)) {
      val s = jaroWinkler(a, b)
      assert(s >= 0.0 && s <= 1.0 + 1e-12)
      assert(math.abs(s - jaroWinkler(b, a)) < 1e-9)
    }
  }

  test("jaro empty vs nonempty is 0") { assert(jaro("", "abc") == 0.0) }

  // ---- n-grams -------------------------------------------------------------

  test("ngrams of short string is the string itself") {
    assert(ngrams("ab", 3) == Set("ab"))
  }

  test("ngrams slides over the string") {
    assert(ngrams("abcd", 3) == Set("abc", "bcd"))
  }

  test("ngramJaccard identical is 1") { assert(ngramJaccard("hello", "hello") == 1.0) }

  test("ngramJaccard disjoint is 0") { assert(ngramJaccard("aaaa", "bbbb") == 0.0) }

  test("ngramJaccard bounded and symmetric (property)") {
    val ss = samples(60, 4)
    for (a <- ss.take(20); b <- ss.slice(20, 40)) {
      val s = ngramJaccard(a, b)
      assert(s >= 0.0 && s <= 1.0)
      assert(math.abs(s - ngramJaccard(b, a)) < 1e-12)
    }
  }

  test("jaccard of empty sets is 1") { assert(jaccard(Set.empty[Int], Set.empty[Int]) == 1.0) }

  test("jaccard known value") { assert(jaccard(Set(1, 2, 3), Set(2, 3, 4)) == 0.5) }

  // ---- IDF token overlap ----------------------------------------------------

  test("idfOverlap identical phrases is 1") {
    val freq = Map("warren" -> 2L, "buffett" -> 3L).withDefaultValue(1L)
    assert(math.abs(idfOverlap("warren buffett", "warren buffett", freq) - 1.0) < 1e-12)
  }

  test("idfOverlap favors shared infrequent words") {
    val freq = Map("buffett" -> 1L, "the" -> 1000L).withDefaultValue(1L)
    val rare = idfOverlap("buffett a", "buffett b", freq)
    val common = idfOverlap("the a", "the b", freq)
    assert(rare > common)
  }

  test("idfOverlap disjoint is 0") {
    assert(idfOverlap("aa bb", "cc dd", _ => 1L) == 0.0)
  }

  test("idfOverlap matches hand computation") {
    val freq = Map("w1" -> 4L, "w2" -> 1L).withDefaultValue(1L)
    def w(f: Long) = 1.0 / math.log(1.0 + f + 1e-12)
    val expected = w(4) / (w(4) + 2 * w(1))
    assert(math.abs(idfOverlap("w1 w2", "w1 aa", freq) - expected) < 1e-9)
  }
}
