package repro.opt

import org.scalatest.funsuite.AnyFunSuite

class CorrelationClusteringSpec extends AnyFunSuite {

  private def asSets(cs: Seq[Set[Int]]): Set[Set[Int]] = cs.toSet

  test("empty input yields no clusters") {
    assert(CorrelationClustering.cluster(0, (_, _) => 0.0).isEmpty)
  }

  test("single node is its own cluster") {
    assert(asSets(CorrelationClustering.cluster(1, (_, _) => 0.0)) == Set(Set(0)))
  }

  test("all-positive scores merge everything") {
    val cs = CorrelationClustering.cluster(5, (_, _) => 1.0)
    assert(asSets(cs) == Set((0 until 5).toSet))
  }

  test("all-negative scores keep singletons") {
    val cs = CorrelationClustering.cluster(4, (_, _) => -1.0)
    assert(cs.size == 4)
  }

  test("two clear blocks are separated (exact regime)") {
    // 0,1,2 agree; 3,4 agree; cross pairs disagree.
    def s(i: Int, j: Int): Double =
      if ((i < 3) == (j < 3)) 1.0 else -1.0
    val cs = asSets(CorrelationClustering.cluster(5, s))
    assert(cs == Set(Set(0, 1, 2), Set(3, 4)))
  }

  test("partition is disjoint and complete") {
    val rng = new scala.util.Random(7)
    val n = 12 // greedy regime
    val scores = Array.fill(n, n)(rng.nextDouble() * 2 - 1)
    def s(i: Int, j: Int): Double = scores(math.min(i, j))(math.max(i, j))
    val cs = CorrelationClustering.cluster(n, s)
    val all = cs.flatten
    assert(all.size == n)
    assert(all.toSet == (0 until n).toSet)
  }

  test("greedy regime separates clear blocks too") {
    val n = 14
    def s(i: Int, j: Int): Double = if ((i % 2) == (j % 2)) 0.8 else -0.8
    val cs = asSets(CorrelationClustering.cluster(n, s))
    assert(cs == Set((0 until n by 2).toSet, (1 until n by 2).toSet))
  }

  test("weakly-linked chain prefers merge only when positive") {
    // 0-1 positive, 1-2 negative stronger: expect {0,1},{2}
    def s(i: Int, j: Int): Double = (i, j) match {
      case (0, 1) | (1, 0) => 0.5
      case (1, 2) | (2, 1) => -0.9
      case _               => -0.1
    }
    val cs = asSets(CorrelationClustering.cluster(3, s))
    assert(cs == Set(Set(0, 1), Set(2)))
  }
}
