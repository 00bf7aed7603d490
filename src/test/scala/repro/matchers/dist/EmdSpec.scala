package repro.matchers.dist

import org.scalatest.funsuite.AnyFunSuite

class EmdSpec extends AnyFunSuite {

  test("identical numeric samples have EMD 0") {
    val a = (1 to 50).map(_.toString)
    assert(Emd.emd(a, a) == 0.0)
  }

  test("identical string samples have EMD 0") {
    val a = Seq("apple", "pear", "plum")
    assert(Emd.emd(a, a) == 0.0)
  }

  test("empty side yields maximal EMD") {
    assert(Emd.emd(Seq.empty, Seq("a")) == 1.0)
  }

  test("disjoint numeric ranges give large EMD") {
    val a = (1 to 50).map(_.toString)
    val b = (1000 to 1050).map(_.toString)
    // Two uniform blobs on disjoint halves of the rank space sit ~0.5 apart.
    assert(Emd.emd(a, b) > 0.4)
  }

  test("same distribution different draws give small EMD") {
    val rng = new scala.util.Random(3)
    val a = (1 to 300).map(_ => (rng.nextGaussian() * 10 + 50).toString)
    val b = (1 to 300).map(_ => (rng.nextGaussian() * 10 + 50).toString)
    assert(Emd.emd(a, b) < 0.1)
  }

  test("shifted distribution gives larger EMD than same distribution") {
    val rng = new scala.util.Random(5)
    val a = (1 to 200).map(_ => (rng.nextGaussian() * 5 + 50).toString)
    val b = (1 to 200).map(_ => (rng.nextGaussian() * 5 + 50).toString)
    val c = (1 to 200).map(_ => (rng.nextGaussian() * 5 + 90).toString)
    assert(Emd.emd(a, c) > Emd.emd(a, b))
  }

  test("EMD is symmetric") {
    val a = Seq("1", "5", "9")
    val b = Seq("2", "4", "8", "10")
    assert(math.abs(Emd.emd(a, b) - Emd.emd(b, a)) < 1e-12)
  }

  test("EMD is within [0,1]") {
    val a = Seq("alpha", "beta", "1", "2")
    val b = Seq("gamma", "3")
    val d = Emd.emd(a, b)
    assert(d >= 0.0 && d <= 1.0)
  }

  test("string EMD distinguishes disjoint vocabularies") {
    val a = Seq("aa", "ab", "ac", "ad")
    val b = Seq("za", "zb", "zc", "zd")
    assert(Emd.emd(a, b) > 0.4)
  }

  test("intersectionEmd refines overlapping numeric ranges") {
    val a = (1 to 100).map(_.toString)
    val b = (51 to 150).map(_.toString)
    val full = Emd.emd(a, b)
    val inter = Emd.intersectionEmd(a, b)
    // Restricted to the shared range [51,100] the distributions agree.
    assert(inter < full)
  }

  test("intersectionEmd falls back to emd for disjoint ranges") {
    val a = (1 to 20).map(_.toString)
    val b = (100 to 120).map(_.toString)
    assert(Emd.intersectionEmd(a, b) == Emd.emd(a, b))
  }
}
