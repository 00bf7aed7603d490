package repro.text

/** String similarity measures over names and token multisets.
  *
  * These are the schema-side building blocks for COMA's Name/NameToken
  * matchers and Cupid's linguistic matching.
  */
object StringSim {

  /** Character trigram Jaccard similarity (COMA's n-gram Name matcher). */
  def trigramSim(a: String, b: String): Double = {
    val ga = grams(a.toLowerCase, 3)
    val gb = grams(b.toLowerCase, 3)
    if (ga.isEmpty && gb.isEmpty) return if (a.toLowerCase == b.toLowerCase) 1.0 else 0.0
    val inter = ga.intersect(gb).size.toDouble
    val union = ga.union(gb).size.toDouble
    if (union == 0) 0.0 else inter / union
  }

  private def grams(s: String, n: Int): Set[String] = {
    val padded = s.filter(_.isLetterOrDigit)
    if (padded.length < n) { if (padded.isEmpty) Set.empty else Set(padded) }
    else padded.sliding(n).toSet
  }

  /** Greedy best-pair token-set similarity: average over both directions of
    * each token's best match in the other set (COMA NameToken / Cupid
    * per-token aggregation).
    */
  def tokenSetSim(as: Seq[String], bs: Seq[String], tokenSim: (String, String) => Double): Double = {
    if (as.isEmpty || bs.isEmpty) return 0.0
    val fwd = as.map(a => bs.map(b => tokenSim(a, b)).max).sum / as.size
    val bwd = bs.map(b => as.map(a => tokenSim(a, b)).max).sum / bs.size
    (fwd + bwd) / 2.0
  }

  /** Jaccard over plain sets — used for label-set overlaps. */
  def jaccard[T](a: Set[T], b: Set[T]): Double = {
    if (a.isEmpty && b.isEmpty) return 0.0
    a.intersect(b).size.toDouble / a.union(b).size.toDouble
  }

  /** Containment of a in b: |a ∩ b| / |a|. */
  def containment[T](a: Set[T], b: Set[T]): Double =
    if (a.isEmpty) 0.0 else a.intersect(b).size.toDouble / a.size
}
