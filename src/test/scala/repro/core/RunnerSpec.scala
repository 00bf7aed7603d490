package repro.core

import repro.SparkSpec
import repro.data.TpcDiLite
import repro.fabricate.Fabricator
import repro.matchers.JaccardLevenshtein
import repro.matchers.coma.Coma
import repro.matchers.cupid.Cupid

class RunnerSpec extends SparkSpec {

  private lazy val pair = Fabricator.unionable(
    TpcDiLite.ref(spark, rows = 200), TpcDiLite.idCol, 0.5,
    noisySchema = false, noisyInstances = false)

  test("runPair yields one result per matcher with timing") {
    val rs = Runner.runPair(spark, pair, Seq(Coma.schemaBased, Cupid.default), sampleCap = 40)
    assert(rs.size == 2)
    assert(rs.forall(_.millis >= 0))
    assert(rs.map(_.family).toSet == Set("COMA-schema", "Cupid"))
    assert(rs.forall(_.pair == pair.name))
  }

  test("verbatim unionable pairs are easy for schema matchers") {
    val rs = Runner.runPair(spark, pair, Seq(Coma.schemaBased), sampleCap = 40)
    assert(rs.head.recall == 1.0)
  }

  test("run sweeps pairs x matchers") {
    val pair2 = Fabricator.joinable(TpcDiLite.ref(spark, rows = 200), TpcDiLite.idCol, 0.5, 0.5, noisySchema = false)
    val rs = Runner.run(spark, Seq(pair, pair2), Seq(Coma.schemaBased, JaccardLevenshtein(0.8)), sampleCap = 40)
    assert(rs.size == 4)
    assert(rs.map(_.scenario).toSet == Set("unionable", "joinable"))
  }

  test("bestPerPairFamily takes the grid maximum") {
    val rs = Seq(
      ExperimentResult("p", "s", false, false, "F", "c1", 0.4, 1),
      ExperimentResult("p", "s", false, false, "F", "c2", 0.9, 1),
      ExperimentResult("p", "s", false, false, "G", "c1", 0.5, 1))
    val best = Runner.bestPerPairFamily(rs)
    assert(best(("p", "F")) == 0.9)
    assert(best(("p", "G")) == 0.5)
  }

  test("summary reports min/median/max of grid-best per scenario-family") {
    val rs = Seq(
      ExperimentResult("p1", "s", false, false, "F", "c1", 0.2, 1),
      ExperimentResult("p1", "s", false, false, "F", "c2", 0.4, 1),
      ExperimentResult("p2", "s", false, false, "F", "c1", 0.8, 1),
      ExperimentResult("p3", "s", false, false, "F", "c1", 0.6, 1))
    val sm = Runner.summary(rs)
    assert(sm(("s", "F")) == ((0.4, 0.6, 0.8)))
  }

  test("avgRuntime averages per family") {
    val rs = Seq(
      ExperimentResult("p1", "s", false, false, "F", "c1", 0.0, 10),
      ExperimentResult("p2", "s", false, false, "F", "c1", 0.0, 30))
    assert(Runner.avgRuntime(rs)("F") == 20.0)
  }

  test("standard grids cover the six non-SemProp families") {
    val fams = Runner.standardGrids.map(_.family).toSet
    assert(fams == Set("Cupid", "SimilarityFlooding", "COMA-schema", "COMA-instance",
      "DistributionBased", "JaccardLevenshtein", "EmbDI"))
  }

  test("defaults include one configuration per family incl. SemProp") {
    val fams = Runner.defaults.map(_.family)
    assert(fams.distinct.size == fams.size)
    assert(fams.contains("SemProp"))
    assert(fams.size == 8)
  }
}
