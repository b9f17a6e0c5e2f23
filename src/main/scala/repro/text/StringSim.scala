package repro.text

/** Pure string-similarity primitives used by JOCL's signals and by the
  * baselines: Levenshtein, Jaro-Winkler, character n-gram Jaccard, and
  * tokenization / morphological normalization helpers.
  *
  * The paper delegates these to "a python library"; here they are
  * implemented directly and property-tested.
  */
object StringSim {

  /** Auxiliary / determiner / preposition tokens that morphological
    * normalization removes (the synthetic generator draws its function
    * words from this list, mirroring how real RPs embed "be", "of", ...).
    */
  val StopWords: Set[String] =
    Set("be", "is", "was", "are", "were", "of", "the", "a", "an", "in",
        "to", "have", "has", "had", "with", "for", "by", "at", "on")

  /** Modifier tokens dropped by normalization (paper §4.2.2: RPs are the
    * same after removing tense, pluralization, auxiliary verb, determiner,
    * and modifier).
    */
  val Modifiers: Set[String] =
    Set("early", "late", "new", "old", "very", "big", "small", "former", "first")

  /** Lower-case whitespace tokenization. */
  def tokens(s: String): Vector[String] =
    s.toLowerCase.split("\\s+").filter(_.nonEmpty).toVector

  /** Strip simple inflectional suffixes. Synthetic concept words have the
    * shape `w<digits><letters>` where the trailing letters carry the
    * synonym variant / typo noise, so the stem is `w<digits>` — this plays
    * the role a lemmatizer (or fastText subwords) plays on real data.
    */
  def stem(w: String): String = {
    val conceptStem = "^(w\\d+)[a-z]*$".r
    w match {
      case conceptStem(c) => c
      case _ =>
        if (w.endsWith("ing") && w.length > 5) w.dropRight(3)
        else if (w.endsWith("ed") && w.length > 4) w.dropRight(2)
        else if (w.endsWith("es") && w.length > 4) w.dropRight(2)
        else if (w.endsWith("s") && w.length > 3) w.dropRight(1)
        else w
    }
  }

  /** Morphological normalization: drop stopwords and modifiers, stem the
    * rest. Falls back to stemming everything if the phrase is all
    * function words (so "be of" still has a non-empty key).
    */
  def morphNormalize(s: String): String = {
    val ts = tokens(s)
    val content = ts.filterNot(t => StopWords(t) || Modifiers(t)).map(stem)
    val kept = if (content.nonEmpty) content else ts.map(stem)
    kept.mkString(" ")
  }

  /** Content tokens after normalization (may be empty). */
  def contentStems(s: String): Vector[String] =
    tokens(s).filterNot(t => StopWords(t) || Modifiers(t)).map(stem)

  /** Classic dynamic-programming Levenshtein distance. */
  def levenshtein(a: String, b: String): Int = {
    if (a.isEmpty) return b.length
    if (b.isEmpty) return a.length
    var prev = Array.tabulate(b.length + 1)(identity)
    var curr = new Array[Int](b.length + 1)
    var i = 1
    while (i <= a.length) {
      curr(0) = i
      var j = 1
      while (j <= b.length) {
        val cost = if (a.charAt(i - 1) == b.charAt(j - 1)) 0 else 1
        curr(j) = math.min(math.min(curr(j - 1) + 1, prev(j) + 1), prev(j - 1) + cost)
        j += 1
      }
      val t = prev; prev = curr; curr = t
      i += 1
    }
    prev(b.length)
  }

  /** Levenshtein similarity normalized to [0, 1] (paper's f_LD). */
  def levenshteinSim(a: String, b: String): Double = {
    val m = math.max(a.length, b.length)
    if (m == 0) 1.0 else 1.0 - levenshtein(a, b).toDouble / m
  }

  /** Jaro similarity. */
  def jaro(a: String, b: String): Double = {
    if (a.isEmpty && b.isEmpty) return 1.0
    if (a.isEmpty || b.isEmpty) return 0.0
    val window = math.max(0, math.max(a.length, b.length) / 2 - 1)
    val aM = new Array[Boolean](a.length)
    val bM = new Array[Boolean](b.length)
    var matches = 0
    var i = 0
    while (i < a.length) {
      val lo = math.max(0, i - window)
      val hi = math.min(b.length - 1, i + window)
      var j = lo
      var found = false
      while (j <= hi && !found) {
        if (!bM(j) && a.charAt(i) == b.charAt(j)) {
          aM(i) = true; bM(j) = true; matches += 1; found = true
        }
        j += 1
      }
      i += 1
    }
    if (matches == 0) return 0.0
    var transpositions = 0
    var k = 0
    i = 0
    while (i < a.length) {
      if (aM(i)) {
        while (!bM(k)) k += 1
        if (a.charAt(i) != b.charAt(k)) transpositions += 1
        k += 1
      }
      i += 1
    }
    val m = matches.toDouble
    (m / a.length + m / b.length + (m - transpositions / 2.0) / m) / 3.0
  }

  /** Jaro-Winkler similarity with standard prefix scaling p = 0.1. */
  def jaroWinkler(a: String, b: String): Double = {
    val j = jaro(a, b)
    var prefix = 0
    while (prefix < math.min(4, math.min(a.length, b.length)) &&
           a.charAt(prefix) == b.charAt(prefix)) prefix += 1
    j + prefix * 0.1 * (1.0 - j)
  }

  /** Character n-grams of a string (n = 3 by default, paper's Ngram signal). */
  def ngrams(s: String, n: Int = 3): Set[String] = {
    val t = s.toLowerCase
    if (t.length < n) Set(t) else t.sliding(n).toSet
  }

  /** Jaccard similarity of character n-gram sets. */
  def ngramJaccard(a: String, b: String, n: Int = 3): Double = {
    val ga = ngrams(a, n)
    val gb = ngrams(b, n)
    val union = (ga ++ gb).size
    if (union == 0) 1.0 else (ga & gb).size.toDouble / union
  }

  /** Jaccard similarity of two sets. */
  def jaccard[A](a: Set[A], b: Set[A]): Double = {
    val union = (a ++ b).size
    if (union == 0) 1.0 else (a & b).size.toDouble / union
  }

  /** IDF token overlap (Galárraga et al. 2014, the paper's Sim_idf):
    * intersection-over-union of token sets, weighted by 1/log(1+f(x)).
    *
    * @param freq frequency of each word in the NP (RP) collection; unseen
    *             words count as frequency 1.
    */
  def idfOverlap(a: String, b: String, freq: String => Long): Double = {
    val wa = tokens(a).toSet
    val wb = tokens(b).toSet
    def w(x: String): Double = 1.0 / math.log(1.0 + math.max(1L, freq(x)).toDouble + 1e-12)
    val union = (wa ++ wb).toSeq.map(w).sum
    if (union == 0) 0.0 else (wa & wb).toSeq.map(w).sum / union
  }
}
