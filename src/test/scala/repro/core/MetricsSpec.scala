package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  private def m(s: String, t: String, sc: Double) = ScoredMatch(s, t, sc)
  private val gt = GroundTruth(Set(("a", "a1"), ("b", "b1"), ("c", "c1")))

  test("perfect ranking has recall@GT 1") {
    val ranked = Seq(m("a", "a1", 0.9), m("b", "b1", 0.8), m("c", "c1", 0.7), m("a", "b1", 0.5))
    assert(Metrics.recallAtGroundTruth(ranked, gt) == 1.0)
  }

  test("correct matches below top-k do not count") {
    val ranked = Seq(m("a", "b1", 0.9), m("b", "a1", 0.8), m("c", "b1", 0.7),
      m("a", "a1", 0.6), m("b", "b1", 0.5), m("c", "c1", 0.4))
    assert(Metrics.recallAtGroundTruth(ranked, gt) == 0.0)
  }

  test("partial top-k hits give fractional recall") {
    val ranked = Seq(m("a", "a1", 0.9), m("b", "x", 0.8), m("c", "c1", 0.7))
    assert(math.abs(Metrics.recallAtGroundTruth(ranked, gt) - 2.0 / 3) < 1e-12)
  }

  test("short result lists are penalized by recall@k") {
    val ranked = Seq(m("a", "a1", 0.9))
    assert(math.abs(Metrics.recallAtGroundTruth(ranked, gt) - 1.0 / 3) < 1e-12)
  }

  test("recallAtGroundTruth equals precision@k at k=|GT| for full lists") {
    val ranked = Seq(m("a", "a1", 0.9), m("b", "x", 0.8), m("c", "c1", 0.7), m("b", "b1", 0.6))
    assert(Metrics.recallAtGroundTruth(ranked, gt) == Metrics.precisionAtK(ranked, gt, gt.size))
  }

  test("empty ground truth yields 0") {
    assert(Metrics.recallAtGroundTruth(Seq(m("a", "a1", 1.0)), GroundTruth(Set.empty)) == 0.0)
  }

  test("empty ranking yields 0") {
    assert(Metrics.recallAtGroundTruth(Seq.empty, gt) == 0.0)
  }

  test("recallAtK rejects non-positive k") {
    intercept[IllegalArgumentException](Metrics.recallAtK(Seq.empty, gt, 0))
  }

  test("precisionAtK over returned prefix") {
    val ranked = Seq(m("a", "a1", 0.9), m("b", "x", 0.8))
    assert(Metrics.precisionAtK(ranked, gt, 5) == 0.5)
  }

  test("median of odd-sized sample") {
    assert(Metrics.median(Seq(3.0, 1.0, 2.0)) == 2.0)
  }

  test("median of even-sized sample averages middle two") {
    assert(Metrics.median(Seq(1.0, 2.0, 3.0, 4.0)) == 2.5)
  }

  test("minMedMax summary") {
    assert(Metrics.minMedMax(Seq(0.2, 0.8, 0.5)) == ((0.2, 0.5, 0.8)))
  }

  test("median of empty sample throws") {
    intercept[IllegalArgumentException](Metrics.median(Seq.empty))
  }
}
