package repro.synth

import org.scalatest.funsuite.AnyFunSuite

class EmbeddingsSpec extends AnyFunSuite {
  import Embeddings._

  test("word vectors are deterministic") {
    assert(wordVec("w336").sameElements(wordVec("w336")))
  }

  test("word vectors are unit length") {
    val n = math.sqrt(wordVec("w336").map(x => x * x).sum)
    assert(math.abs(n - 1.0) < 1e-9)
  }

  test("synonym variants of a concept are close") {
    // 336 = 42*8 + 0 and 337 = 42*8 + 1 are synonyms of concept 42
    assert(sim("w336", "w337") > 0.7)
  }

  test("different concepts are far apart") {
    // 336/8 = 42 vs 344/8 = 43
    assert(sim("w336", "w344") < 0.5)
  }

  test("typo-extended word keeps its concept") {
    // same digits -> same concept base; per-word noise differs
    assert(sim("w336", "w336xy") > 0.7)
  }

  test("phrase vector averages word vectors") {
    val p = phraseVec("w336 w344")
    val a = wordVec("w336"); val b = wordVec("w344")
    val mean = a.zip(b).map { case (x, y) => x + y }
    val nrm = math.sqrt(mean.map(x => x * x).sum)
    val expect = mean.map(_ / nrm)
    p.zip(expect).foreach { case (x, y) => assert(math.abs(x - y) < 1e-9) }
  }

  test("paraphrases with shared concepts are similar") {
    assert(sim("be w80000 of", "be w80001 of") > 0.6)
  }

  test("unrelated acronyms are dissimilar to names") {
    assert(sim("acr7", "w336 w344") < 0.5)
  }

  test("stopwords get damped vectors") {
    val n = math.sqrt(wordVec("of").map(x => x * x).sum)
    assert(math.abs(n - 0.3) < 1e-9)
  }

  test("cosine of identical vectors is 1") {
    val v = wordVec("w100")
    assert(math.abs(cosine(v, v) - 1.0) < 1e-12)
  }

  test("cosine of zero vector is 0") {
    assert(cosine(new Array[Double](Dim), wordVec("w1")) == 0.0)
  }

  test("sim is symmetric") {
    assert(math.abs(sim("w336 w344", "w42") - sim("w42", "w336 w344")) < 1e-12)
  }

  test("empty phrase yields zero similarity") {
    assert(sim("", "w336") == 0.0)
  }

  test("sim bounded in [0, 1]") {
    for (a <- Seq("w1", "acr3", "be w80000 of", "w336 w344");
         b <- Seq("w2", "acr4", "w80001", "w337")) {
      val s = sim(a, b)
      assert(s >= 0.0 && s <= 1.0 + 1e-12)
    }
  }
}
