package repro.text

import org.scalatest.funsuite.AnyFunSuite

class StringSimSpec extends AnyFunSuite {

  test("trigram sim of identical strings is 1") {
    assert(StringSim.trigramSim("customer", "customer") == 1.0)
  }

  test("trigram sim of disjoint strings is 0") {
    assert(StringSim.trigramSim("aaaa", "bbbb") == 0.0)
  }

  test("trigram sim is symmetric") {
    assert(StringSim.trigramSim("customer", "client") == StringSim.trigramSim("client", "customer"))
  }

  test("trigram sim tolerates case") {
    assert(StringSim.trigramSim("Country", "country") == 1.0)
  }

  test("trigram sim on short strings falls back to equality-ish") {
    assert(StringSim.trigramSim("id", "id") == 1.0)
    assert(StringSim.trigramSim("id", "nm") == 0.0)
  }

  test("prefix similarity is partial") {
    val s = StringSim.trigramSim("customer_name", "customer_code")
    assert(s > 0.2 && s < 1.0)
  }

  test("tokenSetSim of identical token sets is 1 under exact sim") {
    val exact = (a: String, b: String) => if (a == b) 1.0 else 0.0
    assert(StringSim.tokenSetSim(Seq("first", "name"), Seq("first", "name"), exact) == 1.0)
  }

  test("tokenSetSim of disjoint sets is 0 under exact sim") {
    val exact = (a: String, b: String) => if (a == b) 1.0 else 0.0
    assert(StringSim.tokenSetSim(Seq("a"), Seq("b"), exact) == 0.0)
  }

  test("tokenSetSim with empty side is 0") {
    val exact = (a: String, b: String) => if (a == b) 1.0 else 0.0
    assert(StringSim.tokenSetSim(Seq.empty, Seq("b"), exact) == 0.0)
  }

  test("tokenSetSim partial overlap is between 0 and 1") {
    val exact = (a: String, b: String) => if (a == b) 1.0 else 0.0
    val s = StringSim.tokenSetSim(Seq("first", "name"), Seq("last", "name"), exact)
    assert(s == 0.5)
  }

  test("jaccard basics") {
    assert(StringSim.jaccard(Set(1, 2), Set(2, 3)) == 1.0 / 3)
    assert(StringSim.jaccard(Set.empty[Int], Set.empty[Int]) == 0.0)
    assert(StringSim.jaccard(Set(1), Set(1)) == 1.0)
  }

  test("containment basics") {
    assert(StringSim.containment(Set(1, 2), Set(1, 2, 3)) == 1.0)
    assert(StringSim.containment(Set(1, 4), Set(1, 2, 3)) == 0.5)
    assert(StringSim.containment(Set.empty[Int], Set(1)) == 0.0)
  }
}
