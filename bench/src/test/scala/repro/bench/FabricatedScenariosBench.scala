package repro.bench

import repro.SparkSpec
import repro.core._
import repro.experiments.Experiments

/** Figures 4–6 data (the bulk of §VII-A): the full parameter grid over the
  * fabricated pairs from the three §V-A sources, summarized as grid-best
  * Recall@GT min/median/max per method family and relatedness scenario.
  * Asserts the paper's qualitative findings.
  */
class FabricatedScenariosBench extends SparkSpec {

  private lazy val results: Seq[ExperimentResult] =
    Experiments.runFabricated(spark, rows = 800, cap = 100)

  private def best: Map[(String, String), Double] = Runner.bestPerPairFamily(results)

  private def bestByScenario(family: String, scenario: Scenario,
                             noisySchema: Option[Boolean] = None,
                             noisyInstances: Option[Boolean] = None): Seq[Double] = {
    val pairsInScope = results
      .filter(r => r.family == family && r.scenario == scenario.label)
      .filter(r => noisySchema.forall(_ == r.noisySchema))
      .filter(r => noisyInstances.forall(_ == r.noisyInstances))
      .map(_.pair).distinct
    pairsInScope.map(p => best((p, family)))
  }

  test("print the Fig.4-6 summaries") {
    println(Experiments.renderSummary("Fig.4 data: schema-based methods", results,
      Seq("Cupid", "SimilarityFlooding", "COMA-schema")))
    println(Experiments.renderSummary("Fig.5 data: instance-based methods", results,
      Seq("COMA-instance", "DistributionBased", "JaccardLevenshtein")))
    println(Experiments.renderSummary("Fig.6 data: hybrid methods", results,
      Seq("EmbDI", "SemProp")))
    assert(results.nonEmpty)
  }

  test("Fig.4 expected: schema-based methods are accurate on verbatim schemata") {
    Seq("Cupid", "SimilarityFlooding", "COMA-schema").foreach { f =>
      Scenario.all.foreach { s =>
        val rs = bestByScenario(f, s, noisySchema = Some(false))
        assert(rs.nonEmpty && Metrics.median(rs) >= 0.9,
          s"$f/$s verbatim median ${Metrics.median(rs)}")
      }
    }
  }

  test("Fig.4 interesting: no schema-based method is consistent under noisy schemata") {
    Seq("Cupid", "SimilarityFlooding", "COMA-schema").foreach { f =>
      val rs = Scenario.all.flatMap(s => bestByScenario(f, s, noisySchema = Some(true)))
      assert(rs.min < 0.75, s"$f noisy-schema min ${rs.min}")
    }
  }

  test("Fig.4 expected: schema-based results are ~identical across the two joinable scenarios") {
    Seq("Cupid", "SimilarityFlooding", "COMA-schema").foreach { f =>
      val j = bestByScenario(f, Scenario.Joinable)
      val s = bestByScenario(f, Scenario.SemanticallyJoinable)
      assert(math.abs(Metrics.median(j) - Metrics.median(s)) < 0.25,
        s"$f joinable ${Metrics.median(j)} vs sem ${Metrics.median(s)}")
    }
  }

  test("Fig.5 expected: instance-based methods perform better without instance noise") {
    Seq("COMA-instance", "JaccardLevenshtein").foreach { f =>
      val clean = bestByScenario(f, Scenario.Unionable, noisyInstances = Some(false))
      val noisy = bestByScenario(f, Scenario.Unionable, noisyInstances = Some(true))
      assert(Metrics.median(clean) >= Metrics.median(noisy) - 0.05,
        s"$f clean ${Metrics.median(clean)} vs noisy ${Metrics.median(noisy)}")
    }
  }

  test("Fig.5 expected: instance-based methods are very effective on joinable pairs") {
    Seq("COMA-instance", "DistributionBased", "JaccardLevenshtein").foreach { f =>
      val rs = bestByScenario(f, Scenario.Joinable)
      assert(Metrics.median(rs) >= 0.6, s"$f joinable median ${Metrics.median(rs)}")
    }
  }

  test("Fig.5 interesting: view-unionable is harder than unionable for instance-based methods") {
    Seq("COMA-instance", "JaccardLevenshtein").foreach { f =>
      val u = bestByScenario(f, Scenario.Unionable)
      val v = bestByScenario(f, Scenario.ViewUnionable)
      assert(Metrics.median(v) <= Metrics.median(u) + 0.05,
        s"$f union ${Metrics.median(u)} vs view ${Metrics.median(v)}")
    }
  }

  test("Fig.5 interesting: semantically-joinable is harder than joinable") {
    Seq("COMA-instance", "DistributionBased", "JaccardLevenshtein").foreach { f =>
      val j = bestByScenario(f, Scenario.Joinable)
      val s = bestByScenario(f, Scenario.SemanticallyJoinable)
      assert(Metrics.median(s) <= Metrics.median(j) + 0.05,
        s"$f joinable ${Metrics.median(j)} vs sem ${Metrics.median(s)}")
    }
  }

  test("Fig.6 interesting: hybrid methods do not dominate despite using both signals") {
    // EmbDI median never beats the best instance-based median per scenario.
    Scenario.all.foreach { s =>
      val embdi = Metrics.median(bestByScenario("EmbDI", s))
      val bestInstance = Seq("COMA-instance", "DistributionBased", "JaccardLevenshtein")
        .map(f => Metrics.median(bestByScenario(f, s))).max
      assert(embdi <= bestInstance + 0.1, s"$s embdi $embdi vs instance $bestInstance")
    }
  }

  test("Fig.6 interesting: SemProp is weak on the domain-specific ChEMBL source") {
    // Paper: SemProp's effectiveness is "unexpectedly low" — never dominant,
    // with high dispersion. Asserted as the comparative claim: its median
    // never beats the best instance-based method in any scenario, and its
    // worst pair collapses below 0.5.
    Scenario.all.foreach { s =>
      val sem = Metrics.median(bestByScenario("SemProp", s))
      val bestInstance = Seq("COMA-instance", "DistributionBased", "JaccardLevenshtein")
        .map(f => Metrics.median(bestByScenario(f, s))).max
      assert(sem <= bestInstance + 0.02, s"$s semprop $sem vs instance $bestInstance")
    }
    val all = Scenario.all.flatMap(s => bestByScenario("SemProp", s))
    assert(all.min <= 0.5, s"semprop min ${all.min}")
  }
}
