package repro.matchers.dist

/** Earth Mover's Distance between two column value samples, the similarity
  * core of the Distribution-based matcher [Zhang et al., SIGMOD'11].
  *
  * Following the original's rank-based construction: the union of the two
  * samples is sorted (numerically when both sides parse as numbers,
  * lexicographically otherwise) and each value is mapped to its normalized
  * rank in [0, 1]. The 1-D EMD between the two empirical distributions is
  * then the area between their CDFs, which for sorted samples reduces to a
  * single merge pass. Result is in [0, 1]: 0 = identical distributions.
  */
object Emd {

  /** EMD between two samples of raw (string) values. */
  def emd(a: Seq[String], b: Seq[String]): Double = {
    if (a.isEmpty || b.isEmpty) return 1.0
    val na = a.flatMap(_.toDoubleOption)
    val nb = b.flatMap(_.toDoubleOption)
    val numeric = na.size >= a.size * 0.9 && nb.size >= b.size * 0.9
    if (numeric) emdOnRanks(rankPositions(na.sorted, nb.sorted))
    else {
      val sa = a.sorted; val sb = b.sorted
      emdOnRanks(rankPositionsStr(sa, sb))
    }
  }

  /** EMD restricted to the union-rank space of the two samples'
    * *intersection-relevant* region — phase 2's refinement measure. We keep
    * only values lying within the overlap of the two ranges, falling back to
    * the plain EMD when the ranges are disjoint.
    */
  def intersectionEmd(a: Seq[String], b: Seq[String]): Double = {
    val na = a.flatMap(_.toDoubleOption); val nb = b.flatMap(_.toDoubleOption)
    if (na.size >= a.size * 0.9 && nb.size >= b.size * 0.9 && na.nonEmpty && nb.nonEmpty) {
      val lo = math.max(na.min, nb.min); val hi = math.min(na.max, nb.max)
      if (lo > hi) return emd(a, b)
      val fa = na.filter(v => v >= lo && v <= hi).sorted
      val fb = nb.filter(v => v >= lo && v <= hi).sorted
      if (fa.isEmpty || fb.isEmpty) emd(a, b) else emdOnRanks(rankPositions(fa, fb))
    } else {
      // String domains: restrict to the union of values present in either
      // sample that share a first character with some value of the other —
      // a cheap proxy for range intersection on lexicographic order.
      val headsB = b.iterator.filter(_.nonEmpty).map(_.charAt(0)).toSet
      val headsA = a.iterator.filter(_.nonEmpty).map(_.charAt(0)).toSet
      val fa = a.filter(v => v.nonEmpty && headsB.contains(v.charAt(0))).sorted
      val fb = b.filter(v => v.nonEmpty && headsA.contains(v.charAt(0))).sorted
      if (fa.isEmpty || fb.isEmpty) emd(a, b) else emdOnRanks(rankPositionsStr(fa, fb))
    }
  }

  /** Normalized rank positions of both sorted numeric samples in their
    * sorted union; returns (ranksA, ranksB) each ascending in [0, 1].
    */
  private def rankPositions(sa: Seq[Double], sb: Seq[Double]): (Array[Double], Array[Double]) = {
    val union = (sa ++ sb).distinct.sorted
    val rank = union.zipWithIndex.toMap
    val denom = math.max(1, union.size - 1).toDouble
    (sa.map(v => rank(v) / denom).toArray, sb.map(v => rank(v) / denom).toArray)
  }

  private def rankPositionsStr(sa: Seq[String], sb: Seq[String]): (Array[Double], Array[Double]) = {
    val union = (sa ++ sb).distinct.sorted
    val rank = union.zipWithIndex.toMap
    val denom = math.max(1, union.size - 1).toDouble
    (sa.map(v => rank(v) / denom).toArray, sb.map(v => rank(v) / denom).toArray)
  }

  /** Area between the CDFs of two ascending rank arrays: EMD in 1-D. */
  private def emdOnRanks(rs: (Array[Double], Array[Double])): Double = {
    val (ra, rb) = rs
    // Evaluate |CDF_a(x) - CDF_b(x)| over the merged breakpoints.
    val xs = (ra ++ rb).distinct.sorted
    if (xs.length < 2) return 0.0
    var acc = 0.0
    var i = 0
    while (i < xs.length - 1) {
      val x = xs(i)
      val cdfA = upperBound(ra, x).toDouble / ra.length
      val cdfB = upperBound(rb, x).toDouble / rb.length
      acc += math.abs(cdfA - cdfB) * (xs(i + 1) - x)
      i += 1
    }
    math.min(1.0, acc)
  }

  /** Number of elements <= x in an ascending array. */
  private def upperBound(arr: Array[Double], x: Double): Int = {
    var lo = 0; var hi = arr.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (arr(mid) <= x) lo = mid + 1 else hi = mid
    }
    lo
  }
}
