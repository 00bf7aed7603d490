package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.Experiments
import repro.matchers.JaccardLevenshtein
import repro.matchers.coma.Coma
import repro.matchers.cupid.Cupid
import repro.matchers.dist.DistributionBased
import repro.matchers.embdi.EmbDI
import repro.matchers.semprop.SemProp
import repro.matchers.simflood.SimilarityFlooding

/** Table II: the per-method parameter grids. Regenerates the grid from the
  * implementations and asserts the ranges match the paper (with the
  * documented step coarsenings of DESIGN.md).
  */
class TableIIBench extends AnyFunSuite {

  test("Table II: parameter grids match the paper's ranges") {
    val rows = Seq(
      Seq("Cupid", "leaf_w_struct", "[0, 0.6]", "0.2"),
      Seq("Cupid", "w_struct", "[0, 0.6]", "0.2"),
      Seq("Cupid", "th_accept", "[0.3, 0.7]", "0.2 (paper: [0.3,0.8] step 0.1)"),
      Seq("Sim. Fl.", "prop. coeff.", "inverse_average", "-"),
      Seq("Sim. Fl.", "fix-point comp.", "C", "-"),
      Seq("COMA", "strategy", "[schema, inst.]", "-"),
      Seq("COMA", "threshold", "0", "-"),
      Seq("Dist.#1", "phase thresholds", "[0.1, 0.2]", "0.05"),
      Seq("Dist.#2", "phase thresholds", "[0.3, 0.5]", "0.1"),
      Seq("SemProp", "minh.threshold", "[0.2, 0.3]", "0.1"),
      Seq("SemProp", "sem.threshold", "[0.4, 0.6]", "0.1"),
      Seq("SemProp", "coh.sem.threshold", "[0.2, 0.4]", "0.2"),
      Seq("EmbDI", "train. algorithm", "word2vec", "-"),
      Seq("EmbDI", "sentence_length", "60", "-"),
      Seq("EmbDI", "window_size", "3", "-"),
      Seq("EmbDI", "n_dimensions", "300->64 (scaled)", "-"),
      Seq("Jacc.Lev.", "threshold", "[0.4, 0.8]", "0.2 (paper: 0.1)"),
    )
    println(Experiments.render("Table II: method parameterization",
      Seq("method", "parameter", "values", "step"), rows))

    // Grid cardinalities implied by the ranges above.
    assert(Cupid.grid.size == 4 * 4 * 3)
    assert(Cupid.grid.map(_.leafWStruct).distinct.sorted == Seq(0.0, 0.2, 0.4, 0.6))
    assert(Cupid.grid.map(_.thAccept).distinct.sorted == Seq(0.3, 0.5, 0.7))
    assert(SimilarityFlooding.grid.size == 1)
    assert(Coma.grid.map(_.strategy).sorted == Seq("instance", "schema"))
    assert(DistributionBased.grid.size == 18)
    assert(SemProp.grid.size == 12)
    assert(EmbDI.grid.size == 1)
    assert(EmbDI.default.sentenceLength == 60 && EmbDI.default.windowSize == 3)
    assert(JaccardLevenshtein.grid.map(_.threshold) == Seq(0.4, 0.6, 0.8))
  }

  test("the full sweep size is the paper's structure at reduced scale") {
    val configs = repro.core.Runner.standardGrids.size + SemProp.grid.size
    // Paper: 135 configurations; ours after step coarsening:
    assert(configs == 48 + 1 + 2 + 18 + 3 + 1 + 12, s"got $configs")
  }
}
