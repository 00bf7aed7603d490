package repro.matchers.dist

import repro.SparkSpec
import repro.core.{GroundTruth, Metrics}
import repro.matchers.MatcherFixtures

class DistributionBasedSpec extends SparkSpec with MatcherFixtures {

  private lazy val src = tdata("custA", customersA)
  private lazy val tgt = tdata("custB", customersB)

  test("matching columns share clusters on the fixture") {
    val ms = run(DistributionBased(0.3, 0.3), src, tgt)
    assert(Metrics.recallAtGroundTruth(ms, customersGt) >= 0.6)
  }

  test("identical tables match themselves perfectly at tight thresholds") {
    val ms = run(DistributionBased(0.1, 0.1), src, src)
    val gt = GroundTruth(src.columns.map(c => c -> c).toSet)
    assert(Metrics.recallAtGroundTruth(ms, gt) >= 0.8)
  }

  test("distribution matching works without any value overlap") {
    import spark.implicits._
    // Same gaussian-ish distribution, disjoint draws.
    val rng = new scala.util.Random(1)
    val a = tdata("da", (1 to 200).map(_ => Tuple1(math.rint(rng.nextGaussian() * 10 + 100))).toDF("m1"))
    val b = tdata("db", (1 to 200).map(_ => Tuple1(math.rint(rng.nextGaussian() * 10 + 100))).toDF("m2"))
    val ms = run(DistributionBased(0.2, 0.2), a, b)
    assert(score(ms, "m1", "m2") > 0.8)
    a.unpersist(); b.unpersist()
  }

  test("distinct distributions land in different clusters at tight thresholds") {
    import spark.implicits._
    val a = tdata("dc", (1 to 150).map(i => Tuple1(i.toDouble)).toDF("low"))
    val b = tdata("dd", (1 to 150).map(i => Tuple1(i * 1000.0 + 500000)).toDF("high"))
    val ms = run(DistributionBased(0.1, 0.1), a, b)
    assert(score(ms, "low", "high") == 0.0) // different clusters -> no match emitted
    a.unpersist(); b.unpersist()
  }

  test("looser thresholds (Dist#2) find more matches than tight ones (Dist#1)") {
    val tight = run(DistributionBased(0.1, 0.1), src, tgt)
    val loose = run(DistributionBased(0.5, 0.5), src, tgt)
    assert(loose.size >= tight.size)
  }

  test("output contains only cross-table pairs and is ranked") {
    val ms = run(DistributionBased(0.4, 0.4), src, tgt)
    assert(ms.forall(m => src.columns.contains(m.srcCol) && tgt.columns.contains(m.tgtCol)))
    assertRanked(ms)
  }

  test("captures 1-to-many matches through shared clusters") {
    import spark.implicits._
    val rng = new scala.util.Random(9)
    def draw() = math.rint(rng.nextGaussian() * 5 + 40)
    val a = tdata("ea", (1 to 150).map(_ => (draw(), draw())).toDF("x1", "x2"))
    val b = tdata("eb", (1 to 150).map(_ => Tuple1(draw())).toDF("y"))
    val ms = run(DistributionBased(0.2, 0.2), a, b)
    assert(score(ms, "x1", "y") > 0.0)
    assert(score(ms, "x2", "y") > 0.0)
    a.unpersist(); b.unpersist()
  }

  test("Table II grids: Dist#1 3x3 in [0.1,0.2], Dist#2 3x3 in [0.3,0.5]") {
    assert(DistributionBased.grid1.size == 9)
    assert(DistributionBased.grid2.size == 9)
    assert(DistributionBased.grid1.forall(d => d.theta1 <= 0.2 && d.theta2 <= 0.2))
    assert(DistributionBased.grid2.forall(d => d.theta1 >= 0.3 && d.theta2 >= 0.3))
  }

  test("declares value-overlap and distribution match types") {
    import repro.core.MatchType._
    assert(DistributionBased.default.matchTypes == Set(ValueOverlap, Distribution))
  }
}
