package repro.core

/** Effectiveness metrics of §II-C. Valentine evaluates ranked match lists
  * with Recall@k where k = |ground truth| (a.k.a. R-Precision); with that k
  * it coincides with Precision@k, so a single number is reported.
  */
object Metrics {

  /** Recall at an explicit cutoff k: (# relevant in top-k) / k. */
  def recallAtK(ranked: Seq[ScoredMatch], gt: GroundTruth, k: Int): Double = {
    require(k > 0, "k must be positive")
    val hits = ranked.take(k).count(gt.contains)
    hits.toDouble / k
  }

  /** The paper's headline metric: Recall@|ground truth|. */
  def recallAtGroundTruth(ranked: Seq[ScoredMatch], gt: GroundTruth): Double =
    if (gt.size == 0) 0.0 else recallAtK(ranked, gt, gt.size)

  /** Precision at cutoff k over the *returned* list (equals recallAtK when
    * the list has at least k entries; degrades gracefully when shorter).
    */
  def precisionAtK(ranked: Seq[ScoredMatch], gt: GroundTruth, k: Int): Double = {
    val top = ranked.take(k)
    if (top.isEmpty) 0.0 else top.count(gt.contains).toDouble / top.size
  }

  /** Median of a sample (average of middle two for even sizes). */
  def median(xs: Seq[Double]): Double = {
    require(xs.nonEmpty, "median of empty sample")
    val s = xs.sorted
    val n = s.size
    if (n % 2 == 1) s(n / 2) else (s(n / 2 - 1) + s(n / 2)) / 2.0
  }

  /** (min, median, max) summary used by the Figure 4–7 shape tables. */
  def minMedMax(xs: Seq[Double]): (Double, Double, Double) =
    (xs.min, median(xs), xs.max)
}
