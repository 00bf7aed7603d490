package repro.opt

/** Cluster-refinement solver — the offline substitute for the integer
  * programming step of the Distribution-based matcher [18] (the original
  * used IBM CPLEX; the Valentine authors used PuLP).
  *
  * Contract preserved: given pairwise agreement scores s(i,j) in [-1, 1]
  * (positive = the pair should share a cluster), produce a disjoint
  * partition maximizing the sum of within-cluster scores. Components of up
  * to [[ExactLimit]] nodes are solved exactly by partition enumeration;
  * larger ones get greedy agglomeration plus single-node local search, which
  * is within a constant factor on these tiny instances.
  */
object CorrelationClustering {

  /** Largest component solved by exact enumeration (Bell(10) ≈ 1.2e5). */
  val ExactLimit = 9

  /** Partition node indices 0..n-1 given a symmetric score matrix. */
  def cluster(n: Int, score: (Int, Int) => Double): Seq[Set[Int]] = {
    if (n == 0) return Seq.empty
    if (n <= ExactLimit) exact(n, score) else greedy(n, score)
  }

  private def objective(clusters: Seq[Set[Int]], score: (Int, Int) => Double): Double =
    clusters.map { c =>
      val xs = c.toSeq
      (for { i <- xs.indices; j <- i + 1 until xs.size } yield score(xs(i), xs(j))).sum
    }.sum

  private def exact(n: Int, score: (Int, Int) => Double): Seq[Set[Int]] = {
    var best: Seq[Set[Int]] = (0 until n).map(Set(_))
    var bestScore = objective(best, score)
    // Enumerate set partitions via restricted growth strings.
    def rec(i: Int, assignment: Array[Int], nBlocks: Int): Unit = {
      if (i == n) {
        val clusters = (0 until nBlocks).map(b =>
          (0 until n).filter(assignment(_) == b).toSet)
        val s = objective(clusters, score)
        if (s > bestScore) { bestScore = s; best = clusters }
      } else {
        var b = 0
        while (b <= nBlocks) {
          assignment(i) = b
          rec(i + 1, assignment, math.max(nBlocks, b + 1))
          b += 1
        }
      }
    }
    rec(0, new Array[Int](n), 0)
    best.filter(_.nonEmpty)
  }

  private def greedy(n: Int, score: (Int, Int) => Double): Seq[Set[Int]] = {
    var clusters = (0 until n).map(i => Set(i)).toBuffer
    // Agglomerate while the best merge has positive gain.
    var improved = true
    while (improved && clusters.size > 1) {
      improved = false
      var bi = -1; var bj = -1; var bGain = 0.0
      for (i <- clusters.indices; j <- i + 1 until clusters.size) {
        val gain = (for (a <- clusters(i); b <- clusters(j)) yield score(a, b)).sum
        if (gain > bGain) { bGain = gain; bi = i; bj = j }
      }
      if (bi >= 0) {
        clusters(bi) = clusters(bi) ++ clusters(bj)
        clusters.remove(bj)
        improved = true
      }
    }
    // Local search: move single nodes between clusters while it helps.
    var moved = true
    var rounds = 0
    while (moved && rounds < 10) {
      moved = false; rounds += 1
      for (node <- 0 until n) {
        val from = clusters.indexWhere(_.contains(node))
        val stayGain = clusters(from).iterator.filter(_ != node).map(score(node, _)).sum
        var bestTo = -1; var bestGain = stayGain
        for (to <- clusters.indices if to != from) {
          val g = clusters(to).iterator.map(score(node, _)).sum
          if (g > bestGain) { bestGain = g; bestTo = to }
        }
        if (bestGain > stayGain + 1e-12 && bestTo >= 0) {
          clusters(from) = clusters(from) - node
          clusters(bestTo) = clusters(bestTo) + node
          moved = true
        }
      }
      clusters = clusters.filter(_.nonEmpty)
    }
    clusters.toSeq
  }
}
