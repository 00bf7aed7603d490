package repro.fabricate

import org.scalatest.funsuite.AnyFunSuite

class NoiseSpec extends AnyFunSuite {

  test("typo changes exactly one position for letter strings") {
    val v = "customer"
    val t = Noise.typo(v, 1)
    assert(t.length == v.length)
    assert(t != v)
    assert(v.indices.count(i => v(i) != t(i)) == 1)
  }

  test("typo substitutes a keyboard neighbor") {
    val v = "customer"
    val t = Noise.typo(v, 1)
    val i = v.indices.find(i => v(i) != t(i)).get
    assert(Noise.keyboardNeighbors(v(i).toLower).contains(t(i).toLower))
  }

  test("typo preserves case of the substituted character") {
    val t = Noise.typo("CUSTOMER", 1)
    assert(t.forall(_.isUpper))
  }

  test("typo is deterministic in (value, seed)") {
    assert(Noise.typo("address", 5) == Noise.typo("address", 5))
  }

  test("different seeds can yield different typos") {
    val vs = (1 to 20).map(s => Noise.typo("country", s))
    assert(vs.distinct.size > 1)
  }

  test("typo of empty/null string is identity") {
    assert(Noise.typo("", 1) == "")
    assert(Noise.typo(null, 1) == null)
  }

  test("maybeTypo with prob 0 never changes") {
    (1 to 50).foreach(i => assert(Noise.maybeTypo(s"value$i", 3, 0.0) == s"value$i"))
  }

  test("maybeTypo with prob 1 always changes letter strings") {
    (1 to 50).foreach(i => assert(Noise.maybeTypo(s"value$i", 3, 1.0) != s"value$i"))
  }

  test("maybeTypo with prob 0.5 changes roughly half") {
    val changed = (1 to 200).count(i => Noise.maybeTypo(s"value$i", 3, 0.5) != s"value$i")
    assert(changed > 60 && changed < 140, s"changed=$changed")
  }

  test("maybePerturb keeps integral values integral") {
    val out = (1 to 100).map(i => Noise.maybePerturb(i.toDouble, 7, 1.0, 0.1))
    assert(out.forall(v => v == math.rint(v)))
  }

  test("maybePerturb with prob 1 changes values") {
    val changed = (1 to 100).count(i => Noise.maybePerturb(i * 1.5, 7, 1.0, 0.1) != i * 1.5)
    assert(changed > 90)
  }

  test("maybePerturb keeps relative magnitude") {
    (1 to 100).foreach { i =>
      val v = i * 100.0
      val p = Noise.maybePerturb(v, 9, 1.0, 0.1)
      assert(math.abs(p - v) <= v * 0.1 + 1.0 + 1e-9, s"v=$v p=$p")
    }
  }

  test("perturbation is deterministic") {
    assert(Noise.maybePerturb(123.45, 3, 1.0, 0.2) == Noise.maybePerturb(123.45, 3, 1.0, 0.2))
  }
}
