package repro.text

/** Driver-side Levenshtein edit distance and the derived normalized
  * similarity used throughout the matchers.
  *
  * Spark's built-in `levenshtein()` covers the DataFrame paths (e.g. the
  * Jaccard-Levenshtein baseline's fuzzy join); this object covers schema-side
  * comparisons (attribute names, graph node labels) that run on the driver.
  */
object Levenshtein {

  /** Classic two-row dynamic-programming edit distance. */
  def distance(a: String, b: String): Int = {
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

  /** Similarity in [0, 1]: 1 - distance / max-length. Empty = empty scores 1. */
  def similarity(a: String, b: String): Double = {
    val m = math.max(a.length, b.length)
    if (m == 0) 1.0 else 1.0 - distance(a, b).toDouble / m
  }

  /** Case-insensitive similarity — attribute names differ in case freely. */
  def similarityIgnoreCase(a: String, b: String): Double =
    similarity(a.toLowerCase, b.toLowerCase)
}
