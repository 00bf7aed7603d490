package repro.minhash

import org.scalatest.funsuite.AnyFunSuite

class MinHashSpec extends AnyFunSuite {

  private val k = 64

  test("identical sets estimate 1.0") {
    val s = MinHash.signature(Seq("a", "b", "c"), k)
    assert(MinHash.estimate(s, s) == 1.0)
  }

  test("disjoint large sets estimate near 0") {
    val a = MinHash.signature((1 to 200).map(i => s"a$i"), k)
    val b = MinHash.signature((1 to 200).map(i => s"b$i"), k)
    assert(MinHash.estimate(a, b) < 0.15)
  }

  test("half-overlapping sets estimate near 1/3 jaccard") {
    val a = MinHash.signature((1 to 200).map(i => s"v$i"), k)
    val b = MinHash.signature((101 to 300).map(i => s"v$i"), k)
    val est = MinHash.estimate(a, b)
    // True Jaccard = 100/300 = 0.333; allow MinHash variance at k=64.
    assert(est > 0.15 && est < 0.55, s"estimate $est")
  }

  test("estimate is symmetric") {
    val a = MinHash.signature(Seq("x", "y", "z"), k)
    val b = MinHash.signature(Seq("y", "z", "w"), k)
    assert(MinHash.estimate(a, b) == MinHash.estimate(b, a))
  }

  test("signature is deterministic") {
    val a = MinHash.signature(Seq("p", "q"), k)
    val b = MinHash.signature(Seq("q", "p"), k)
    assert(a.toSeq == b.toSeq)
  }

  test("superset signatures dominate (each slot <= subset's)") {
    val small = MinHash.signature((1 to 50).map(i => s"v$i"), k)
    val big = MinHash.signature((1 to 100).map(i => s"v$i"), k)
    (0 until k).foreach(i => assert(big(i) <= small(i)))
  }

  test("mismatched signature lengths throw") {
    intercept[IllegalArgumentException] {
      MinHash.estimate(Array(1L), Array(1L, 2L))
    }
  }
}
