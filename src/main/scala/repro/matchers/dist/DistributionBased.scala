package repro.matchers.dist

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.opt.CorrelationClustering

/** Distribution-based matching [Zhang, Hadjieleftheriou, Ooi et al. —
  * SIGMOD'11], instance-based.
  *
  * Two-phase clustering of the columns of both tables by value-distribution
  * similarity:
  *
  *  1. Phase 1: pairwise rank-based EMD; columns whose EMD ≤ `theta1` are
  *     connected; connected components form candidate clusters.
  *  2. Phase 2: within each candidate cluster the refined intersection-EMD
  *     is computed and the final disjoint clusters are chosen by the
  *     refinement solver ([[CorrelationClustering]], our substitute for the
  *     original's CPLEX / Valentine's PuLP) with agreement score
  *     `theta2 − intersectionEmd`.
  *
  * Adaptation for dataset discovery (§VI): cross-table column pairs sharing
  * a final cluster are emitted as matches ranked by 1 − EMD.
  */
final case class DistributionBased(theta1: Double, theta2: Double) extends Matcher {

  override val name: String = f"DistributionBased(t1=$theta1%.2f,t2=$theta2%.2f)"
  override val family: String = "DistributionBased"
  override val matchTypes: Set[MatchType] =
    Set(MatchType.ValueOverlap, MatchType.Distribution)

  override def matchColumns(spark: SparkSession, src: TableData, tgt: TableData): Seq[ScoredMatch] = {
    // Node universe: source columns then target columns.
    val srcCols = src.columns.toIndexedSeq
    val tgtCols = tgt.columns.toIndexedSeq
    val samples: IndexedSeq[Seq[String]] =
      srcCols.map(c => src.profile(c).sample: Seq[String]) ++
        tgtCols.map(c => tgt.profile(c).sample: Seq[String])
    val n = samples.size
    val isSrc = (i: Int) => i < srcCols.size
    val colName = (i: Int) => if (isSrc(i)) srcCols(i) else tgtCols(i - srcCols.size)

    // Phase 1: EMD graph at theta1, connected components.
    val emdM = Array.ofDim[Double](n, n)
    for (i <- 0 until n; j <- i + 1 until n) {
      val d = Emd.emd(samples(i), samples(j))
      emdM(i)(j) = d; emdM(j)(i) = d
    }
    val parent = Array.tabulate(n)(identity)
    def find(x: Int): Int = { var r = x; while (parent(r) != r) r = parent(r); parent(x) = r; r }
    def union(x: Int, y: Int): Unit = { val a = find(x); val b = find(y); if (a != b) parent(a) = b }
    for (i <- 0 until n; j <- i + 1 until n if emdM(i)(j) <= theta1) union(i, j)
    val components = (0 until n).groupBy(find).values.toSeq

    // Phase 2: refine each component with intersection-EMD via the solver.
    val finalClusters = components.flatMap { comp =>
      if (comp.size <= 2) Seq(comp.toSet)
      else {
        val ids = comp.toIndexedSeq
        val refined = Array.ofDim[Double](ids.size, ids.size)
        for (i <- ids.indices; j <- i + 1 until ids.size) {
          val d = Emd.intersectionEmd(samples(ids(i)), samples(ids(j)))
          refined(i)(j) = d; refined(j)(i) = d
        }
        CorrelationClustering
          .cluster(ids.size, (i, j) => theta2 - refined(i)(j))
          .map(_.map(ids))
      }
    }

    // Emit cross-table pairs that share a final cluster, ranked by 1 - EMD.
    val ms = finalClusters.flatMap { cluster =>
      for {
        i <- cluster.toSeq if isSrc(i)
        j <- cluster.toSeq if !isSrc(j)
      } yield ScoredMatch(colName(i), colName(j), 1.0 - emdM(i)(j))
    }
    Matcher.ranked(ms)
  }
}

object DistributionBased {
  /** Table II Dist#1: phase-1/phase-2 thresholds in [0.1, 0.2] step 0.05. */
  def grid1: Seq[DistributionBased] = for {
    t1 <- Seq(0.1, 0.15, 0.2); t2 <- Seq(0.1, 0.15, 0.2)
  } yield DistributionBased(t1, t2)

  /** Table II Dist#2: thresholds in [0.3, 0.5] step 0.1 — the looser run
    * that "helps the method find more matches in column pairs with low
    * overlap".
    */
  def grid2: Seq[DistributionBased] = for {
    t1 <- Seq(0.3, 0.4, 0.5); t2 <- Seq(0.3, 0.4, 0.5)
  } yield DistributionBased(t1, t2)

  def grid: Seq[DistributionBased] = grid1 ++ grid2
  def default: DistributionBased = DistributionBased(0.3, 0.3)
}
