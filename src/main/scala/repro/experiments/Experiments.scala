package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data._
import repro.fabricate.Fabricator
import repro.matchers.semprop.SemProp

/** Shared experiment drivers behind the `jobs/` entrypoints and the `bench/`
  * table suites. Each function reproduces one evaluation artifact of the
  * paper (see DESIGN.md's per-table index).
  */
object Experiments {

  /** Row counts for the fabricated sources (paper: 7.5–23k; scaled down). */
  val BenchRows = 1000L

  /** Distinct-value sample cap per column at bench scale. */
  val BenchCap = 120

  /** The fabricated pair battery over the three §V-A sources (paper: 540
    * pairs; scaled to 16 variants × 3 sources = 48, same structure).
    */
  def fabricatedPairs(spark: SparkSession, rows: Long = BenchRows): Seq[DatasetPair] =
    Fabricator.suite(TpcDiLite.ref(spark, rows), TpcDiLite.idCol, seed = 23) ++
      Fabricator.suite(OpenDataLite.ref(spark, rows), OpenDataLite.idCol, seed = 29) ++
      Fabricator.suite(ChemblLite.ref(spark, rows), ChemblLite.idCol, seed = 31)

  /** ChEMBL-only fabricated pairs — the SemProp evaluation set (§VII-A3). */
  def chemblPairs(spark: SparkSession, rows: Long = BenchRows): Seq[DatasetPair] =
    Fabricator.suite(ChemblLite.ref(spark, rows), ChemblLite.idCol, seed = 31)

  /** Figures 4–6 data: the full grid over all fabricated pairs, plus the
    * SemProp grid over the ChEMBL pairs.
    */
  def runFabricated(spark: SparkSession, rows: Long = BenchRows,
                    cap: Int = BenchCap, verbose: Boolean = true): Seq[ExperimentResult] = {
    val standard = Runner.run(spark, fabricatedPairs(spark, rows), Runner.standardGrids, cap, verbose)
    val semprop = Runner.run(spark, chemblPairs(spark, rows), SemProp.grid, cap, verbose)
    standard ++ semprop
  }

  /** Figure 7 data: the full grid over the four WikiData pairs. */
  def runWikiData(spark: SparkSession, rows: Long = 1200,
                  cap: Int = BenchCap, verbose: Boolean = true): Seq[ExperimentResult] =
    Runner.run(spark, WikiDataLite.pairs(spark, rows), Runner.standardGrids, cap, verbose)

  /** Table III: grid-best Recall@GT per method on Magellan (average over the
    * 7 pairs) and on ING#1 / ING#2. Returns family -> (magellan, ing1, ing2).
    */
  def tableIII(spark: SparkSession, cap: Int = BenchCap,
               verbose: Boolean = true): Map[String, (Double, Double, Double)] = {
    val magellan = Runner.run(spark, MagellanLite.pairs(spark), Runner.standardGrids, cap, verbose)
    val ing = Runner.run(spark, IngLite.pairs(spark), Runner.standardGrids, cap, verbose)
    val bestMag = Runner.bestPerPairFamily(magellan)
    val bestIng = Runner.bestPerPairFamily(ing)
    val families = magellan.map(_.family).distinct
    families.map { f =>
      val magPairs = magellan.map(_.pair).distinct
      val magAvg = magPairs.map(p => bestMag((p, f))).sum / magPairs.size
      f -> (magAvg, bestIng(("ing/ing1", f)), bestIng(("ing/ing2", f)))
    }.toMap
  }

  /** Table IV: average runtime per experiment (ms) per method family, over
    * one default configuration per family across a fixed pair set. SemProp
    * is timed on its ChEMBL pairs, like the paper's per-method averages over
    * the experiments each method actually ran.
    */
  def tableIV(spark: SparkSession, rows: Long = BenchRows,
              cap: Int = BenchCap, verbose: Boolean = true): Map[String, Double] = {
    val pairs = Fabricator.suite(TpcDiLite.ref(spark, rows), TpcDiLite.idCol, seed = 23).take(4) ++
      chemblPairs(spark, rows).take(4)
    val nonSemProp = Runner.defaults.filterNot(_.family == "SemProp")
    val standard = Runner.run(spark, pairs, nonSemProp, cap, verbose)
    val semprop = Runner.run(spark, chemblPairs(spark, rows).take(4), Seq(SemProp.default), cap, verbose)
    Runner.avgRuntime(standard ++ semprop)
  }

  // ---- rendering -----------------------------------------------------------

  /** Fixed-width table renderer for bench/job stdout. */
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) = r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (Seq(s"== $title ==", line(header), widths.map("-" * _).mkString("  ")) ++ rows.map(line))
      .mkString("\n")
  }

  def fmt(d: Double): String = f"$d%.3f"

  /** Render a Figure 4–7-style summary: family × scenario min/med/max. */
  def renderSummary(title: String, results: Seq[ExperimentResult], families: Seq[String]): String = {
    val sm = Runner.summary(results)
    val scenarios = Scenario.all.map(_.label)
    val rows = for (f <- families) yield {
      Seq(f) ++ scenarios.map { s =>
        sm.get((s, f))
          .map { case (mn, md, mx) => s"${fmt(mn)}/${fmt(md)}/${fmt(mx)}" }
          .getOrElse("-")
      }
    }
    render(title, Seq("method") ++ scenarios.map(_ + " (min/med/max)"), rows)
  }
}
