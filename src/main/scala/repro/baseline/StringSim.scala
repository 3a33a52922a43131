package repro.baseline

/** Classical symbolic string-similarity functions — the feature pool a
  * Magellan-style ER system engineers its features from (the paper's
  * observation (ii): experts pick from pools like SimMetrics' 29
  * functions). All return values in [0, 1], higher = more similar; both
  * inputs null/empty → 1.0 (agreement on absence), one-sided → 0.0.
  */
object StringSim {

  private def bothEmpty(a: String, b: String) = (a == null || a.isEmpty) && (b == null || b.isEmpty)
  private def oneEmpty(a: String, b: String) = (a == null || a.isEmpty) != (b == null || b.isEmpty)

  /** Levenshtein edit distance (full DP matrix, strings here are short). */
  def levenshtein(a: String, b: String): Int = {
    if (a == null || b == null) return math.max(if (a == null) 0 else a.length, if (b == null) 0 else b.length)
    val dp = Array.tabulate(a.length + 1)(i => Array.tabulate(b.length + 1)(j => if (i == 0) j else if (j == 0) i else 0))
    for (i <- 1 to a.length; j <- 1 to b.length) {
      val cost = if (a(i - 1) == b(j - 1)) 0 else 1
      dp(i)(j) = math.min(math.min(dp(i - 1)(j) + 1, dp(i)(j - 1) + 1), dp(i - 1)(j - 1) + cost)
    }
    dp(a.length)(b.length)
  }

  /** Normalized Levenshtein similarity. */
  def levenshteinSim(a: String, b: String): Double =
    if (bothEmpty(a, b)) 1.0
    else if (oneEmpty(a, b)) 0.0
    else 1.0 - levenshtein(a, b).toDouble / math.max(a.length, b.length)

  /** Jaro similarity. */
  def jaro(a: String, b: String): Double = {
    if (bothEmpty(a, b)) return 1.0
    if (oneEmpty(a, b) || a.isEmpty || b.isEmpty) return 0.0
    val window = math.max(0, math.max(a.length, b.length) / 2 - 1)
    val aM = new Array[Boolean](a.length); val bM = new Array[Boolean](b.length)
    var m = 0
    for (i <- a.indices) {
      val lo = math.max(0, i - window); val hi = math.min(b.length - 1, i + window)
      var j = lo
      var found = false
      while (j <= hi && !found) {
        if (!bM(j) && a(i) == b(j)) { aM(i) = true; bM(j) = true; m += 1; found = true }
        j += 1
      }
    }
    if (m == 0) return 0.0
    var t = 0; var k = 0
    for (i <- a.indices if aM(i)) {
      while (!bM(k)) k += 1
      if (a(i) != b(k)) t += 1
      k += 1
    }
    (m.toDouble / a.length + m.toDouble / b.length + (m - t / 2.0) / m) / 3.0
  }

  /** Jaro-Winkler with the standard 0.1 prefix scale, prefix cap 4. */
  def jaroWinkler(a: String, b: String): Double = {
    val j = jaro(a, b)
    if (a == null || b == null) return j
    val prefix = a.zip(b).take(4).takeWhile { case (x, y) => x == y }.size
    j + prefix * 0.1 * (1.0 - j)
  }

  def tokens(s: String): Set[String] =
    if (s == null) Set.empty
    else s.toLowerCase.split("\\s+").filter(_.nonEmpty).toSet

  /** Token-set Jaccard. */
  def jaccard(a: String, b: String): Double = {
    val ta = tokens(a); val tb = tokens(b)
    if (ta.isEmpty && tb.isEmpty) 1.0
    else if (ta.isEmpty || tb.isEmpty) 0.0
    else ta.intersect(tb).size.toDouble / ta.union(tb).size
  }

  /** Token overlap coefficient. */
  def overlap(a: String, b: String): Double = {
    val ta = tokens(a); val tb = tokens(b)
    if (ta.isEmpty && tb.isEmpty) 1.0
    else if (ta.isEmpty || tb.isEmpty) 0.0
    else ta.intersect(tb).size.toDouble / math.min(ta.size, tb.size)
  }

  def trigrams(s: String): Map[String, Int] =
    if (s == null || s.length < 3) Map.empty
    else ("  " + s.toLowerCase + "  ").sliding(3).toSeq.groupBy(identity).map { case (g, o) => g -> o.size }

  /** Cosine similarity over character-trigram count vectors (the classical
    * prefilter of Köpcke et al. used in the paper's setup section).
    */
  def trigramCosine(a: String, b: String): Double = {
    if (bothEmpty(a, b)) return 1.0
    val ga = trigrams(a); val gb = trigrams(b)
    if (ga.isEmpty || gb.isEmpty) return 0.0
    val dotP = ga.keysIterator.map(k => ga(k).toDouble * gb.getOrElse(k, 0)).sum
    val na = math.sqrt(ga.valuesIterator.map(v => v.toDouble * v).sum)
    val nb = math.sqrt(gb.valuesIterator.map(v => v.toDouble * v).sum)
    dotP / (na * nb)
  }

  /** Exact match indicator. */
  def exact(a: String, b: String): Double =
    if (bothEmpty(a, b)) 1.0 else if (a != null && a == b) 1.0 else 0.0

  /** Relative numeric closeness, 0 when either side is not a number. */
  def numericSim(a: String, b: String): Double =
    try {
      val x = a.toDouble; val y = b.toDouble
      val d = math.max(math.abs(x), math.abs(y))
      if (d == 0.0) 1.0 else math.max(0.0, 1.0 - math.abs(x - y) / d)
    } catch { case _: Exception => 0.0 }
}
