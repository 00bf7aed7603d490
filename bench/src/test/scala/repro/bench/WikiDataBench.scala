package repro.bench

import repro.SparkSpec
import repro.core._
import repro.experiments.Experiments

/** Figure 7 data: per-method grid-best Recall@GT over the four curated
  * WikiData-lite pairs, with the paper's §VII-B1 observations asserted.
  */
class WikiDataBench extends SparkSpec {

  private lazy val results: Seq[ExperimentResult] =
    Experiments.runWikiData(spark, rows = 1200, cap = Experiments.BenchCap)

  private lazy val best: Map[(String, String), Double] = Runner.bestPerPairFamily(results)

  private def recallOf(family: String, scenario: Scenario): Double = {
    val pair = results.find(r => r.family == family && r.scenario == scenario.label).get.pair
    best((pair, family))
  }

  private val schemaBased = Seq("Cupid", "SimilarityFlooding", "COMA-schema")
  private val instanceBased = Seq("COMA-instance", "DistributionBased", "JaccardLevenshtein")

  test("print the Fig.7 table") {
    val fams = (schemaBased ++ instanceBased :+ "EmbDI")
    val rows = fams.map { f =>
      Seq(f) ++ Scenario.all.map(s => Experiments.fmt(recallOf(f, s)))
    }
    println(Experiments.render("Fig.7 data: WikiData recall@GT (grid-best)",
      Seq("method") ++ Scenario.all.map(_.label), rows))
    assert(results.nonEmpty)
  }

  test("unionable: instance-based methods beat schema-based ones") {
    val inst = instanceBased.map(recallOf(_, Scenario.Unionable)).max
    val schema = schemaBased.map(recallOf(_, Scenario.Unionable)).max
    assert(inst >= schema, s"instance $inst vs schema $schema")
  }

  test("view-unionable: distribution-based output quality drops") {
    val dist = recallOf("DistributionBased", Scenario.ViewUnionable)
    val bestOther = (instanceBased.filterNot(_ == "DistributionBased"))
      .map(recallOf(_, Scenario.ViewUnionable)).max
    assert(dist <= bestOther + 0.05, s"dist $dist vs other $bestOther")
  }

  test("joinable: instance-based methods find all relevant matches") {
    assert(recallOf("COMA-instance", Scenario.Joinable) >= 0.9)
    instanceBased.foreach { f =>
      assert(recallOf(f, Scenario.Joinable) >= 0.8, s"$f ${recallOf(f, Scenario.Joinable)}")
    }
  }

  test("joinable: schema-based methods miss some matches (renamed columns)") {
    val bestInst = instanceBased.map(recallOf(_, Scenario.Joinable)).min
    schemaBased.foreach { f =>
      assert(recallOf(f, Scenario.Joinable) <= bestInst + 0.1)
    }
  }

  test("semantically-joinable: COMA-instance leads; baseline and EmbDI stay acceptable") {
    val coma = recallOf("COMA-instance", Scenario.SemanticallyJoinable)
    assert(coma >= 0.6, s"coma $coma")
    assert(recallOf("JaccardLevenshtein", Scenario.SemanticallyJoinable) > 0.2)
    assert(recallOf("EmbDI", Scenario.SemanticallyJoinable) > 0.1)
  }
}
