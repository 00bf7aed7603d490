package repro.text

import org.scalatest.funsuite.AnyFunSuite

class ThesaurusSpec extends AnyFunSuite {

  test("client and customer are synonyms") {
    assert(Thesaurus.synonyms("client", "customer"))
  }

  test("synonymy ignores case") {
    assert(Thesaurus.synonyms("Partner", "SPOUSE"))
  }

  test("a word is its own synonym even when unknown") {
    assert(Thesaurus.synonyms("zzz-unknown", "zzz-unknown"))
  }

  test("unrelated words are not synonyms") {
    assert(!Thesaurus.synonyms("country", "phone"))
  }

  test("words from different groups are not synonyms") {
    assert(!Thesaurus.synonyms("customer", "employer"))
  }

  test("tokenSim is 1 for synonyms") {
    assert(Thesaurus.tokenSim("cntr", "country") == 1.0)
  }

  test("tokenSim falls back to scaled Levenshtein for non-synonyms") {
    val s = Thesaurus.tokenSim("custome", "customer")
    assert(s > 0.6 && s < 1.0)
  }

  test("canonical maps all group members to the same representative") {
    assert(Thesaurus.canonical("client") == Thesaurus.canonical("customer"))
    assert(Thesaurus.canonical("partner") == Thesaurus.canonical("spouse"))
  }

  test("canonical of unknown word is itself lowercased") {
    assert(Thesaurus.canonical("Quux") == "quux")
  }

  test("every group has at least two members") {
    assert(Thesaurus.groups.forall(_.size >= 2))
  }

  test("no word belongs to two groups") {
    val all = Thesaurus.groups.flatten
    assert(all.size == all.distinct.size)
  }
}
