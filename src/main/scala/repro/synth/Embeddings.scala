package repro.synth

import scala.util.Random
import repro.text.StringSim

/** Deterministic synthetic word embeddings (fastText stand-in).
  *
  * The synthetic vocabulary encodes a concept id in each content word
  * (`w<concept><variant letters>`); synonyms of a concept share a base
  * direction and differ by a small per-word noise component, so cosine
  * similarity of paraphrases is high and of unrelated words is ~0 —
  * the same decision surface real distributional embeddings provide.
  * Function words get damped random directions (they blur phrase
  * vectors, as real stopwords do). Everything is a pure function of the
  * string, so embeddings need no storage and are identical across the
  * driver, executors, and test runs.
  */
object Embeddings extends Serializable {

  val Dim = 24
  private val ConceptRe = "^w(\\d+)[a-z]*$".r

  private def unit(seed: Long): Array[Double] = {
    val r = new Random(seed)
    val v = Array.fill(Dim)(r.nextGaussian())
    val n = math.sqrt(v.map(x => x * x).sum)
    v.map(_ / n)
  }

  private def hash(s: String): Long = {
    var h = 1125899906842597L
    var i = 0
    while (i < s.length) { h = 31 * h + s.charAt(i); i += 1 }
    h
  }

  /** Vector of a single word. */
  def wordVec(word: String): Array[Double] = {
    val w = word.toLowerCase
    w match {
      case ConceptRe(wordId) =>
        // word id = concept * 8 + synonym-variant (see OkbGen.word):
        // synonyms share the concept base direction.
        val concept = wordId.toLong / 8
        val base = unit(hash("concept:" + concept))
        val noise = unit(hash("word:" + w))
        val v = Array.tabulate(Dim)(i => base(i) + 0.35 * noise(i))
        val n = math.sqrt(v.map(x => x * x).sum)
        v.map(_ / n)
      case _ if StringSim.StopWords(w) || StringSim.Modifiers(w) =>
        unit(hash("stop:" + w)).map(_ * 0.3)
      case _ =>
        // out-of-vocabulary (acronyms, typo'd digits): word-specific direction
        unit(hash("oov:" + w))
    }
  }

  /** Phrase vector = average of word vectors (paper §3.1.3), normalized. */
  def phraseVec(phrase: String): Array[Double] = {
    val ts = StringSim.tokens(phrase)
    if (ts.isEmpty) return new Array[Double](Dim)
    val acc = new Array[Double](Dim)
    ts.foreach { t =>
      val v = wordVec(t)
      var i = 0
      while (i < Dim) { acc(i) += v(i); i += 1 }
    }
    val n = math.sqrt(acc.map(x => x * x).sum)
    if (n == 0) acc else acc.map(_ / n)
  }

  def cosine(a: Array[Double], b: Array[Double]): Double = {
    var dot = 0.0; var na = 0.0; var nb = 0.0
    var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0 || nb == 0) 0.0 else dot / math.sqrt(na * nb)
  }

  /** Sim_emb in [0, 1]: cosine clipped at 0 (anti-correlated ≈ unrelated). */
  def sim(a: String, b: String): Double =
    math.max(0.0, cosine(phraseVec(a), phraseVec(b)))
}
