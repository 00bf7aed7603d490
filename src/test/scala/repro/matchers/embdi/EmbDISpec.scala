package repro.matchers.embdi

import repro.SparkSpec
import repro.core.Metrics
import repro.matchers.MatcherFixtures

class EmbDISpec extends SparkSpec with MatcherFixtures {

  // Small, fast configuration for unit tests.
  private val embdi = EmbDI(sentenceLength = 20, nDimensions = 32, rowCap = 80,
    walksPerColumn = 15, walksPerRow = 1, epochs = 2)

  private lazy val src = tdata("custA", customersA)
  private lazy val tgt = tdata("custB", customersB)

  test("covers all column pairs, ranked") {
    val ms = run(embdi, src, tgt)
    assert(ms.size == src.columns.size * tgt.columns.size)
    assertRanked(ms)
  }

  test("value bridges drive matching: overlapping columns beat disjoint ones") {
    import spark.implicits._
    val a = tdata("ga", (1 to 60).map(i => (s"shared$i", s"only_a$i")).toDF("s_col", "u_col"))
    val b = tdata("gb", (1 to 60).map(i => (s"shared$i", s"only_b$i")).toDF("t_col", "v_col"))
    val ms = run(embdi, a, b)
    assert(score(ms, "s_col", "t_col") > score(ms, "u_col", "v_col"),
      s"bridge=${score(ms, "s_col", "t_col")} nobridge=${score(ms, "u_col", "v_col")}")
    a.unpersist(); b.unpersist()
  }

  test("achieves positive recall on the renamed value-overlap fixture") {
    val ms = run(embdi, src, tgt)
    assert(Metrics.recallAtGroundTruth(ms, customersGt) > 0.0)
  }

  test("deterministic in the seed") {
    val m1 = run(embdi, src, tgt)
    val m2 = run(embdi, src, tgt)
    assert(m1 == m2)
  }

  test("different seeds give different embeddings (training randomness)") {
    val other = embdi.copy(seed = 99)
    assert(run(embdi, src, tgt) != run(other, src, tgt))
  }

  test("scores are in [0,1] (cosine rescaled)") {
    run(embdi, src, tgt).foreach(m => assert(m.score >= 0.0 && m.score <= 1.0))
  }

  test("grid is the single Table II configuration") {
    assert(EmbDI.grid.size == 1)
    val d = EmbDI.default
    assert(d.sentenceLength == 60 && d.windowSize == 3)
  }

  test("declares the embeddings match type only") {
    assert(embdi.matchTypes == Set(repro.core.MatchType.Embeddings))
  }
}
