package repro.matchers.semprop

import repro.SparkSpec
import repro.matchers.MatcherFixtures

class SemPropSpec extends SparkSpec with MatcherFixtures {

  private val sp = SemProp.default

  test("ontology links obvious class names") {
    val link = sp.linkToClass("assay_type")
    assert(link.exists(_._1 == "Assay") || link.exists(_._1 == "Category"),
      s"got $link")
  }

  test("domain-specific identifiers fail to link confidently") {
    val strict = SemProp(0.2, 0.8, 0.2)
    assert(strict.linkToClass("xqzt_bao_93842").isEmpty)
  }

  test("coherence is high for a repeated-vocabulary column") {
    assert(sp.coherence(Seq("liver", "liver", "brain", "kidney", "liver")) >= 0.0)
    assert(sp.coherence(Seq("liver", "liver", "liver")) > 0.9)
  }

  test("coherence of near-empty samples is 0") {
    assert(sp.coherence(Seq("only")) == 0.0)
    assert(sp.coherence(Seq.empty) == 0.0)
  }

  test("semantic matches rank above syntactic ones") {
    import spark.implicits._
    val a = tdata("sa", (1 to 60).map(i => (s"organism ${i % 5}", s"val$i")).toDF("organism_name", "other_code"))
    val b = tdata("sb", (1 to 60).map(i => (s"organism ${i % 5}", s"val$i")).toDF("species_label", "misc_code"))
    val ms = run(SemProp(0.1, 0.3, 0.0), a, b)
    val semScore = score(ms, "organism_name", "species_label")
    if (semScore >= 0.5) { // linked semantically
      assert(ms.head.score >= 0.5)
    }
    // Syntactic fallback caught the value-identical code columns.
    assert(score(ms, "other_code", "misc_code") > 0.0)
    a.unpersist(); b.unpersist()
  }

  test("syntactic stage respects the MinHash threshold") {
    import spark.implicits._
    val a = tdata("sc1", (1 to 80).map(i => Tuple1(s"aa$i")).toDF("p"))
    val b = tdata("sd1", (1 to 80).map(i => Tuple1(s"zz$i")).toDF("q"))
    // Disjoint values: estimated jaccard ~0 < 0.2 threshold -> no match.
    val ms = run(SemProp(0.2, 0.99, 0.99), a, b)
    assert(score(ms, "p", "q") == 0.0)
    a.unpersist(); b.unpersist()
  }

  test("identical value sets pass the syntactic stage (flat band)") {
    import spark.implicits._
    val a = tdata("se", (1 to 80).map(i => Tuple1(s"tok$i")).toDF("p"))
    val b = tdata("sf", (1 to 80).map(i => Tuple1(s"tok$i")).toDF("q"))
    val ms = run(SemProp(0.2, 0.99, 0.99), a, b)
    val s = score(ms, "p", "q")
    assert(s > 0.0 && s < 0.5) // flat syntactic band, below semantic scores
    a.unpersist(); b.unpersist()
  }

  test("grid matches Table II (2 x 3 x 2)") {
    assert(SemProp.grid.size == 12)
  }

  test("chembl-lite ontology is non-trivial") {
    assert(Ontology.chemblLite.size >= 10)
    assert(Ontology.chemblLite.classes.forall(_.labels.nonEmpty))
  }

  test("declares hybrid match types") {
    import repro.core.MatchType._
    assert(sp.matchTypes == Set(AttributeOverlap, ValueOverlap, Embeddings))
  }
}
