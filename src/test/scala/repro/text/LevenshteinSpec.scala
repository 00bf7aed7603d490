package repro.text

import org.scalatest.funsuite.AnyFunSuite

class LevenshteinSpec extends AnyFunSuite {

  private val rng = new scala.util.Random(12345)
  private def randStr(): String = {
    val n = rng.nextInt(12)
    (0 until n).map(_ => ('a' + rng.nextInt(6)).toChar).mkString
  }
  private val samples: Seq[(String, String, String)] =
    (0 until 200).map(_ => (randStr(), randStr(), randStr()))

  test("identical strings have distance 0") {
    assert(Levenshtein.distance("match", "match") == 0)
  }

  test("empty vs non-empty is the other's length") {
    assert(Levenshtein.distance("", "abc") == 3)
    assert(Levenshtein.distance("abc", "") == 3)
  }

  test("both empty is 0 with similarity 1") {
    assert(Levenshtein.distance("", "") == 0)
    assert(Levenshtein.similarity("", "") == 1.0)
  }

  test("single substitution") {
    assert(Levenshtein.distance("cat", "car") == 1)
  }

  test("single insertion") {
    assert(Levenshtein.distance("cat", "cart") == 1)
  }

  test("single deletion") {
    assert(Levenshtein.distance("cart", "cat") == 1)
  }

  test("classic kitten/sitting = 3") {
    assert(Levenshtein.distance("kitten", "sitting") == 3)
  }

  test("distance is symmetric (sampled)") {
    samples.foreach { case (a, b, _) =>
      assert(Levenshtein.distance(a, b) == Levenshtein.distance(b, a))
    }
  }

  test("distance satisfies triangle inequality (sampled)") {
    samples.foreach { case (a, b, c) =>
      assert(Levenshtein.distance(a, c) <= Levenshtein.distance(a, b) + Levenshtein.distance(b, c))
    }
  }

  test("distance bounded by max length (sampled)") {
    samples.foreach { case (a, b, _) =>
      assert(Levenshtein.distance(a, b) <= math.max(a.length, b.length))
    }
  }

  test("similarity in [0,1] (sampled)") {
    samples.foreach { case (a, b, _) =>
      val s = Levenshtein.similarity(a, b)
      assert(s >= 0.0 && s <= 1.0)
    }
  }

  test("similarity of equal strings is 1") {
    assert(Levenshtein.similarity("schema", "schema") == 1.0)
  }

  test("similarityIgnoreCase ignores case") {
    assert(Levenshtein.similarityIgnoreCase("Country", "country") == 1.0)
  }

  test("disjoint same-length strings score 0") {
    assert(Levenshtein.similarity("aaa", "bbb") == 0.0)
  }

  test("typo'd word keeps high similarity") {
    assert(Levenshtein.similarity("customer", "custoner") > 0.8)
  }
}
