package repro.sim

/** Pure string-similarity functions used to build Magellan-style feature
  * vectors (Figure 1(c) of the paper).
  *
  * Every function returns a similarity in [0, 1] (1 = identical) and is
  * total: `null` inputs are handled by [[FeatureGen]] before these are
  * called. All functions are deterministic and symmetric unless noted.
  */
object StringSims {

  /** Lowercase, collapse whitespace, strip leading/trailing space. */
  def normalize(s: String): String =
    s.toLowerCase.replaceAll("\\s+", " ").trim

  /** Word tokens (split on non-alphanumeric). */
  def tokens(s: String): Set[String] =
    normalize(s).split("[^a-z0-9]+").filter(_.nonEmpty).toSet

  /** Word tokens preserving duplicates and order. */
  def tokenList(s: String): Seq[String] =
    normalize(s).split("[^a-z0-9]+").filter(_.nonEmpty).toSeq

  /** Character q-grams of the padded string, as a set. Strings shorter than
    * q yield the single padded gram so the measure stays defined.
    */
  def qgrams(s: String, q: Int = 3): Set[String] = {
    val t   = normalize(s)
    val pad = ("#" * (q - 1)) + t + ("#" * (q - 1))
    if (t.isEmpty) Set.empty
    else pad.sliding(q).toSet
  }

  /** Levenshtein edit distance (iterative two-row DP). */
  def levenshtein(a: String, b: String): Int = {
    if (a == b) return 0
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

  /** Levenshtein similarity: 1 - dist / max(len). Empty-vs-empty = 1. */
  def levSim(a: String, b: String): Double = {
    val (x, y) = (normalize(a), normalize(b))
    val m = math.max(x.length, y.length)
    if (m == 0) 1.0 else 1.0 - levenshtein(x, y).toDouble / m
  }

  /** Jaro similarity. */
  def jaro(a0: String, b0: String): Double = {
    val a = normalize(a0); val b = normalize(b0)
    if (a.isEmpty && b.isEmpty) return 1.0
    if (a.isEmpty || b.isEmpty) return 0.0
    val window = math.max(0, math.max(a.length, b.length) / 2 - 1)
    val aMatched = new Array[Boolean](a.length)
    val bMatched = new Array[Boolean](b.length)
    var matches = 0
    var i = 0
    while (i < a.length) {
      val lo = math.max(0, i - window)
      val hi = math.min(b.length - 1, i + window)
      var j = lo
      var done = false
      while (j <= hi && !done) {
        if (!bMatched(j) && a.charAt(i) == b.charAt(j)) {
          aMatched(i) = true; bMatched(j) = true; matches += 1; done = true
        }
        j += 1
      }
      i += 1
    }
    if (matches == 0) return 0.0
    // transpositions: compare matched chars in order
    var transpositions = 0
    var k = 0
    i = 0
    while (i < a.length) {
      if (aMatched(i)) {
        while (!bMatched(k)) k += 1
        if (a.charAt(i) != b.charAt(k)) transpositions += 1
        k += 1
      }
      i += 1
    }
    val m = matches.toDouble
    (m / a.length + m / b.length + (m - transpositions / 2.0) / m) / 3.0
  }

  /** Jaro-Winkler similarity with standard scaling p=0.1, prefix cap 4. */
  def jaroWinkler(a0: String, b0: String): Double = {
    val a = normalize(a0); val b = normalize(b0)
    val j = jaro(a, b)
    var prefix = 0
    while (prefix < math.min(4, math.min(a.length, b.length)) &&
           a.charAt(prefix) == b.charAt(prefix)) prefix += 1
    j + prefix * 0.1 * (1.0 - j)
  }

  private def jaccardSets(x: Set[String], y: Set[String]): Double = {
    if (x.isEmpty && y.isEmpty) 1.0
    else if (x.isEmpty || y.isEmpty) 0.0
    else {
      val inter = x.intersect(y).size.toDouble
      inter / (x.size + y.size - inter)
    }
  }

  private def cosineSets(x: Set[String], y: Set[String]): Double = {
    if (x.isEmpty && y.isEmpty) 1.0
    else if (x.isEmpty || y.isEmpty) 0.0
    else x.intersect(y).size.toDouble / math.sqrt(x.size.toDouble * y.size)
  }

  private def diceSets(x: Set[String], y: Set[String]): Double = {
    if (x.isEmpty && y.isEmpty) 1.0
    else if (x.isEmpty || y.isEmpty) 0.0
    else 2.0 * x.intersect(y).size / (x.size + y.size)
  }

  private def overlapSets(x: Set[String], y: Set[String]): Double = {
    if (x.isEmpty && y.isEmpty) 1.0
    else if (x.isEmpty || y.isEmpty) 0.0
    else x.intersect(y).size.toDouble / math.min(x.size, y.size)
  }

  def jaccardQgram(a: String, b: String, q: Int = 3): Double = jaccardSets(qgrams(a, q), qgrams(b, q))
  def cosineQgram(a: String, b: String, q: Int = 3): Double  = cosineSets(qgrams(a, q), qgrams(b, q))
  def diceQgram(a: String, b: String, q: Int = 3): Double    = diceSets(qgrams(a, q), qgrams(b, q))
  def overlapQgram(a: String, b: String, q: Int = 3): Double = overlapSets(qgrams(a, q), qgrams(b, q))

  def jaccardTokens(a: String, b: String): Double = jaccardSets(tokens(a), tokens(b))
  def cosineTokens(a: String, b: String): Double  = cosineSets(tokens(a), tokens(b))
  def diceTokens(a: String, b: String): Double    = diceSets(tokens(a), tokens(b))
  def overlapTokens(a: String, b: String): Double = overlapSets(tokens(a), tokens(b))

  /** Exact match after normalization. */
  def exact(a: String, b: String): Double =
    if (normalize(a) == normalize(b)) 1.0 else 0.0

  /** Monge-Elkan: average over tokens of `a` of the best Jaro-Winkler match
    * in `b`. Asymmetric in general; we symmetrize by averaging both
    * directions so the feature is orientation-independent.
    */
  def mongeElkan(a: String, b: String): Double = {
    def oneWay(xs: Seq[String], ys: Seq[String]): Double =
      if (xs.isEmpty && ys.isEmpty) 1.0
      else if (xs.isEmpty || ys.isEmpty) 0.0
      else xs.map(x => ys.map(y => jaroWinkler(x, y)).max).sum / xs.size
    val ta = tokenList(a); val tb = tokenList(b)
    (oneWay(ta, tb) + oneWay(tb, ta)) / 2.0
  }

  /** Relative similarity of two numeric strings: 1 - |a-b| / max(|a|,|b|).
    * Non-parsable values fall back to exact match on the raw strings.
    */
  def numericSim(a: String, b: String): Double = {
    (a.trim.toDoubleOption, b.trim.toDoubleOption) match {
      case (Some(x), Some(y)) =>
        val m = math.max(math.abs(x), math.abs(y))
        if (m == 0.0) 1.0 else math.max(0.0, 1.0 - math.abs(x - y) / m)
      case _ => exact(a, b)
    }
  }

  /** Similarity on digits only — robust to phone formatting divergence
    * between the source tables (`213/467-1108` vs `213-467-1108`).
    */
  def digitsExact(a: String, b: String): Double = {
    val da = a.filter(_.isDigit); val db = b.filter(_.isDigit)
    if (da.isEmpty && db.isEmpty) 1.0 else if (da == db) 1.0 else 0.0
  }
}
