package repro.core

import org.apache.spark.sql.SparkSession
import repro.matchers.JaccardLevenshtein
import repro.matchers.coma.Coma
import repro.matchers.cupid.Cupid
import repro.matchers.dist.DistributionBased
import repro.matchers.embdi.EmbDI
import repro.matchers.semprop.SemProp
import repro.matchers.simflood.SimilarityFlooding

/** One executed (pair, method-configuration) experiment. */
final case class ExperimentResult(
    pair: String,
    scenario: String,
    noisySchema: Boolean,
    noisyInstances: Boolean,
    family: String,
    config: String,
    recall: Double,
    millis: Long,
)

/** The experiment harness of Figure 1: profile each dataset pair once, then
  * exhaustively execute every (method configuration × pair) combination,
  * recording Recall@|ground truth| and wall time.
  */
object Runner {

  /** All non-SemProp method grids (Table II). SemProp needs an ontology and
    * is only run on the ontology-compatible source, as in the paper.
    */
  def standardGrids: Seq[Matcher] =
    Cupid.grid ++ SimilarityFlooding.grid ++ Coma.grid ++
      DistributionBased.grid ++ JaccardLevenshtein.grid ++ EmbDI.grid

  /** One representative configuration per method family, for timing runs
    * (Table IV reports average runtime per experiment).
    */
  def defaults: Seq[Matcher] = Seq(
    Cupid.default, SimilarityFlooding.default, Coma.schemaBased, Coma.instanceBased,
    DistributionBased.default, SemProp.default, EmbDI.default,
    JaccardLevenshtein(0.6),
  )

  /** Profile both sides of a pair once; callers must `unpersist()` after. */
  def profilePair(spark: SparkSession, pair: DatasetPair, sampleCap: Int): (TableData, TableData) =
    (Profiler.profile(spark, pair.source, sampleCap),
      Profiler.profile(spark, pair.target, sampleCap))

  /** Execute `matchers` on one profiled pair. */
  def runPair(
      spark: SparkSession,
      pair: DatasetPair,
      matchers: Seq[Matcher],
      sampleCap: Int = 150,
  ): Seq[ExperimentResult] = {
    val (src, tgt) = profilePair(spark, pair, sampleCap)
    try {
      matchers.map { m =>
        val t0 = System.nanoTime()
        val ranked = m.matchColumns(spark, src, tgt)
        val ms = (System.nanoTime() - t0) / 1000000
        val recall = Metrics.recallAtGroundTruth(ranked, pair.groundTruth)
        ExperimentResult(pair.name, pair.scenario.label, pair.noisySchema,
          pair.noisyInstances, m.family, m.name, recall, ms)
      }
    } finally {
      src.unpersist(); tgt.unpersist()
    }
  }

  /** Execute the full grid over all pairs (the paper's ~75K-run sweep at
    * reduced scale).
    */
  def run(
      spark: SparkSession,
      pairs: Seq[DatasetPair],
      matchers: Seq[Matcher],
      sampleCap: Int = 150,
      verbose: Boolean = false,
  ): Seq[ExperimentResult] =
    pairs.flatMap { p =>
      if (verbose) Console.err.println(s"[Runner] pair ${p.name}")
      runPair(spark, p, matchers, sampleCap)
    }

  /** Grid-search-best recall per (pair, family) — the paper's "idealized
    * near-optimal conditions" aggregation (§VI-B): each algorithm operates
    * under its best configuration, found with ground truth.
    */
  def bestPerPairFamily(results: Seq[ExperimentResult]): Map[(String, String), Double] =
    results.groupBy(r => (r.pair, r.family)).view.mapValues(_.map(_.recall).max).toMap

  /** (min, median, max) of grid-best recall per family within a scenario —
    * the Figure 4–6 summary statistic.
    */
  def summary(
      results: Seq[ExperimentResult],
  ): Map[(String, String), (Double, Double, Double)] = {
    val best = results
      .groupBy(r => (r.pair, r.scenario, r.family))
      .view.mapValues(_.map(_.recall).max)
    best.toSeq
      .groupBy { case ((_, scenario, family), _) => (scenario, family) }
      .view.mapValues(xs => Metrics.minMedMax(xs.map(_._2)))
      .toMap
  }

  /** Average runtime (ms) per family over all runs — Table IV's statistic. */
  def avgRuntime(results: Seq[ExperimentResult]): Map[String, Double] =
    results.groupBy(_.family).view
      .mapValues(rs => rs.map(_.millis.toDouble).sum / rs.size).toMap
}
