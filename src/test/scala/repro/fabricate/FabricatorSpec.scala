package repro.fabricate

import repro.SparkSpec
import repro.core.Scenario
import repro.data.TpcDiLite

class FabricatorSpec extends SparkSpec {

  private lazy val ref = TpcDiLite.ref(spark, rows = 300)
  private val id = TpcDiLite.idCol

  test("unionable pair keeps full schema on both sides") {
    val p = Fabricator.unionable(ref, id, 0.5, noisySchema = false, noisyInstances = false)
    assert(p.scenario == Scenario.Unionable)
    assert(p.source.df.columns.toSeq == ref.df.columns.toSeq)
    assert(p.target.df.columns.toSeq == ref.df.columns.toSeq)
    assert(p.groundTruth.pairs == ref.df.columns.map(c => c -> c).toSet)
  }

  test("unionable ground truth follows schema noise renames") {
    val p = Fabricator.unionable(ref, id, 0.5, noisySchema = true, noisyInstances = false)
    assert(p.groundTruth.size == ref.df.columns.length)
    val tgtCols = p.target.df.columns.toSet
    p.groundTruth.pairs.foreach { case (s, t) =>
      assert(ref.df.columns.contains(s))
      assert(tgtCols.contains(t))
    }
    // Noise means at least most names changed.
    assert(p.groundTruth.pairs.count { case (s, t) => s != t } > ref.df.columns.length / 2)
  }

  test("view-unionable pair has zero row overlap and partial column overlap") {
    val p = Fabricator.viewUnionable(ref, id, 0.5, noisySchema = false, noisyInstances = false)
    assert(p.scenario == Scenario.ViewUnionable)
    val shared = p.groundTruth.pairs.map(_._1)
    assert(shared.contains(id))
    // Both sides have unique columns beyond the shared set.
    assert(p.source.df.columns.length > shared.size)
    assert(p.target.df.columns.length > shared.size)
    assert(p.source.df.join(p.target.df, id).count() == 0)
  }

  test("joinable pair shares the key and overlapping rows") {
    val p = Fabricator.joinable(ref, id, 0.5, rowOverlap = 0.5, noisySchema = false)
    assert(p.scenario == Scenario.Joinable)
    assert(p.groundTruth.pairs.map(_._1).contains(id))
    assert(p.source.df.join(p.target.df, id).count() > 0)
  }

  test("joinable with full row overlap joins back to original row count") {
    val p = Fabricator.joinable(ref, id, 0.3, rowOverlap = 1.0, noisySchema = false)
    assert(p.source.df.join(p.target.df, id).count() == ref.df.count())
  }

  test("semantically-joinable pair has noisy instances flagged") {
    val p = Fabricator.semanticallyJoinable(ref, id, 0.5, 0.5, noisySchema = false)
    assert(p.scenario == Scenario.SemanticallyJoinable)
    assert(p.noisyInstances)
  }

  test("column overlap fraction controls ground-truth size") {
    val p30 = Fabricator.joinable(ref, id, 0.3, 0.5, noisySchema = false)
    val p70 = Fabricator.joinable(ref, id, 0.7, 0.5, noisySchema = false)
    assert(p30.groundTruth.size < p70.groundTruth.size)
  }

  test("instance noise changes values but not schema") {
    val clean = Fabricator.unionable(ref, id, 0.5, noisySchema = false, noisyInstances = false)
    val noisy = Fabricator.unionable(ref, id, 0.5, noisySchema = false, noisyInstances = true)
    assert(noisy.target.df.columns.toSeq == clean.target.df.columns.toSeq)
    // Noise is deterministic per value, so distinct counts stay stable; the
    // check is that some values now fall outside the clean vocabulary.
    val cleanNames = clean.target.df.select("last_name").distinct().collect().map(_.getString(0)).toSet
    val noisyNames = noisy.target.df.select("last_name").distinct().collect().map(_.getString(0)).toSet
    assert((noisyNames -- cleanNames).nonEmpty)
  }

  test("suite fabricates the standard battery with all scenarios") {
    val pairs = Fabricator.suite(ref, id)
    assert(pairs.size == 16)
    assert(pairs.map(_.scenario).toSet == Scenario.all.toSet)
    assert(pairs.map(_.name).distinct.size == pairs.size)
    // 4 noise combos per union-ish scenario.
    assert(pairs.count(_.scenario == Scenario.Unionable) == 4)
    assert(pairs.count(_.scenario == Scenario.ViewUnionable) == 4)
    assert(pairs.count(_.scenario == Scenario.Joinable) == 4)
    assert(pairs.count(_.scenario == Scenario.SemanticallyJoinable) == 4)
  }

  test("joinable scenario never carries instance noise; semantic always does") {
    val pairs = Fabricator.suite(ref, id)
    assert(pairs.filter(_.scenario == Scenario.Joinable).forall(!_.noisyInstances))
    assert(pairs.filter(_.scenario == Scenario.SemanticallyJoinable).forall(_.noisyInstances))
  }

  test("fabrication is deterministic") {
    val p1 = Fabricator.unionable(ref, id, 0.5, noisySchema = true, noisyInstances = true)
    val p2 = Fabricator.unionable(ref, id, 0.5, noisySchema = true, noisyInstances = true)
    assert(p1.target.df.columns.toSeq == p2.target.df.columns.toSeq)
    assert(p1.target.df.exceptAll(p2.target.df).count() == 0)
  }
}
