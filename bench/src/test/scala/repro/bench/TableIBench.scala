package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.MatchType
import repro.core.MatchType._
import repro.matchers.JaccardLevenshtein
import repro.matchers.coma.Coma
import repro.matchers.cupid.Cupid
import repro.matchers.dist.DistributionBased
import repro.matchers.embdi.EmbDI
import repro.matchers.semprop.SemProp
import repro.matchers.simflood.SimilarityFlooding
import repro.experiments.Experiments

/** Table I: the matcher ↔ match-type coverage matrix. Regenerates the table
  * from each implementation's declared `matchTypes` and asserts it equals
  * the paper's rows.
  */
class TableIBench extends AnyFunSuite {

  private val paper: Seq[(String, Set[MatchType])] = Seq(
    "Cupid" -> Set(AttributeOverlap, SemanticOverlap, DataType),
    "Similarity Flooding" -> Set(AttributeOverlap, DataType),
    "COMA" -> Set(AttributeOverlap, ValueOverlap, SemanticOverlap, DataType, Distribution),
    "Distribution-based" -> Set(ValueOverlap, Distribution),
    "SemProp" -> Set(AttributeOverlap, ValueOverlap, Embeddings),
    "EmbDI" -> Set(Embeddings),
    "Jaccard-Levenshtein" -> Set(ValueOverlap),
  )

  private val ours: Seq[(String, Set[MatchType])] = Seq(
    "Cupid" -> Cupid.default.matchTypes,
    "Similarity Flooding" -> SimilarityFlooding.default.matchTypes,
    "COMA" -> Coma.instanceBased.matchTypes, // the COMA row spans both flavors
    "Distribution-based" -> DistributionBased.default.matchTypes,
    "SemProp" -> SemProp.default.matchTypes,
    "EmbDI" -> EmbDI.default.matchTypes,
    "Jaccard-Levenshtein" -> JaccardLevenshtein(0.6).matchTypes,
  )

  test("Table I: implemented match-type coverage equals the paper's matrix") {
    val header = Seq("method") ++ MatchType.all.map(_.label)
    val rows = ours.map { case (name, ts) =>
      Seq(name) ++ MatchType.all.map(t => if (ts.contains(t)) "x" else "")
    }
    println(Experiments.render("Table I: schema matching techniques and match types", header, rows))
    paper.zip(ours).foreach { case ((pn, pt), (on, ot)) =>
      assert(pn == on)
      assert(ot == pt, s"$pn: ours $ot vs paper $pt")
    }
  }

  test("every Table I match type is covered by at least one method") {
    val covered = ours.flatMap(_._2).toSet
    assert(covered == MatchType.all.toSet)
  }
}
