package repro.matchers.simflood

import repro.SparkSpec
import repro.core.Metrics
import repro.matchers.MatcherFixtures

class SimilarityFloodingSpec extends SparkSpec with MatcherFixtures {

  private lazy val src = tdata("custA", customersA)
  private lazy val tgt = tdata("custB", customersB)
  private val sf = SimilarityFlooding.default

  test("self-match puts identical columns on top") {
    val ms = run(sf, src, src)
    val recall = Metrics.recallAtGroundTruth(
      ms, repro.core.GroundTruth(src.columns.map(c => c -> c).toSet))
    assert(recall == 1.0)
  }

  test("covers all column pairs") {
    val ms = run(sf, src, tgt)
    assert(ms.size == src.columns.size * tgt.columns.size)
    assertRanked(ms)
  }

  test("similar names plus type context produce positive scores") {
    val ms = run(sf, src, tgt)
    assert(score(ms, "balance", "account_balance") > 0.0)
  }

  test("name-similar pairs outrank dissimilar ones") {
    val ms = run(sf, src, tgt)
    assert(score(ms, "cust_name", "client_name") > score(ms, "cust_name", "years"))
  }

  test("fixpoint converges (scores finite, in [0,1] after normalization)") {
    val ms = run(sf, src, tgt)
    ms.foreach(m => assert(!m.score.isNaN && m.score >= 0.0 && m.score <= 1.0 + 1e-9))
  }

  test("propagation transfers similarity through shared types") {
    import spark.implicits._
    // Columns with dissimilar names but same type in a tiny schema: the
    // type edge should still propagate some similarity.
    val a = tdata("ta", Seq((1, "x")).toDF("alpha_num", "alpha_txt"))
    val b = tdata("tb", Seq((2, "y")).toDF("beta_num", "beta_txt"))
    val ms = run(sf, a, b)
    assert(score(ms, "alpha_num", "beta_num") > score(ms, "alpha_num", "beta_txt"))
    a.unpersist(); b.unpersist()
  }

  test("deterministic across runs") {
    val m1 = run(sf, src, tgt)
    val m2 = run(sf, src, tgt)
    assert(m1 == m2)
  }

  test("single configuration per Table II") {
    assert(SimilarityFlooding.grid.size == 1)
  }

  test("declares attribute-overlap and data-type match types") {
    import repro.core.MatchType._
    assert(sf.matchTypes == Set(AttributeOverlap, DataType))
  }
}
