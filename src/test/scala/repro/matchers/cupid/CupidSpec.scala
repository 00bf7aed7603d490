package repro.matchers.cupid

import repro.SparkSpec
import repro.core.Metrics
import repro.matchers.MatcherFixtures

class CupidSpec extends SparkSpec with MatcherFixtures {

  private lazy val src = tdata("custA", customersA)
  private lazy val tgt = tdata("custB", customersB)
  private val cupid = Cupid.default

  test("identical names rank at the top") {
    val ms = run(cupid, src, src)
    src.columns.foreach { c =>
      assert(score(ms, c, c) >= ms.map(_.score).max - 1e-9, s"column $c not maximal")
    }
  }

  test("output covers the full cross product, ranked") {
    val ms = run(cupid, src, tgt)
    assert(ms.size == src.columns.size * tgt.columns.size)
    assertRanked(ms)
  }

  test("thesaurus synonyms beat unrelated names") {
    val ms = run(cupid, src, tgt)
    // cust/client and country/nation are synonym groups.
    assert(score(ms, "cust_id", "client_id") > score(ms, "cust_id", "nation"))
    assert(score(ms, "country", "nation") > score(ms, "country", "client_name"))
  }

  test("synonym-driven recall on the renamed fixture") {
    val ms = run(cupid, src, tgt)
    assert(Metrics.recallAtGroundTruth(ms, customersGt) >= 0.6)
  }

  test("type compatibility scales the linguistic score") {
    assert(cupid.typeCompat("numeric", "numeric") == 1.0)
    assert(cupid.typeCompat("numeric", "date") == 0.4)
    assert(cupid.typeCompat("string", "numeric") == 0.6)
  }

  test("linguistic similarity is 1 for same-name tokens") {
    assert(cupid.linguisticSim("first_name", "FirstName") == 1.0)
  }

  test("linguistic similarity rewards synonyms") {
    assert(cupid.linguisticSim("partner", "spouse") == 1.0)
    assert(cupid.linguisticSim("partner_name", "spouse_name") == 1.0)
  }

  test("structural weight changes scores") {
    val flat = Cupid(0.0, 0.0, 0.5)
    val struct = Cupid(0.6, 0.6, 0.5)
    val msFlat = run(flat, src, tgt)
    val msStruct = run(struct, src, tgt)
    // With leaf_w_struct=0 the score is purely linguistic; adding structure
    // moves scores for type-compatible pairs.
    val changed = customersGt.pairs.count { case (s, t) =>
      math.abs(score(msFlat, s, t) - score(msStruct, s, t)) > 1e-6
    }
    assert(changed > 0)
  }

  test("scores stay in [0,1]") {
    run(cupid, src, tgt).foreach(m => assert(m.score >= 0.0 && m.score <= 1.0 + 1e-9))
  }

  test("grid matches Table II shape (4x4x3 after step coarsening)") {
    assert(Cupid.grid.size == 48)
    assert(Cupid.grid.forall(c => c.leafWStruct <= 0.6 && c.wStruct <= 0.6))
  }

  test("declares attribute/semantic/data-type match types") {
    import repro.core.MatchType._
    assert(cupid.matchTypes == Set(AttributeOverlap, SemanticOverlap, DataType))
  }
}
