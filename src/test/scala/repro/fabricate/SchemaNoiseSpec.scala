package repro.fabricate

import org.scalatest.funsuite.AnyFunSuite

class SchemaNoiseSpec extends AnyFunSuite {

  test("prefixWithTable prepends the table name") {
    assert(SchemaNoise.prefixWithTable("prospect", "first_name") == "prospect_first_name")
  }

  test("abbreviate keeps first three letters of each token") {
    assert(SchemaNoise.abbreviate("first_name") == "fir_nam")
  }

  test("abbreviate of short tokens is stable") {
    assert(SchemaNoise.abbreviate("id") == "id")
  }

  test("dropVowels removes interior vowels") {
    assert(SchemaNoise.dropVowels("country") == "cntry")
  }

  test("dropVowels keeps leading vowel") {
    assert(SchemaNoise.dropVowels("address") == "addrss")
  }

  test("dropVowels never empties a name") {
    assert(SchemaNoise.dropVowels("aeiou").nonEmpty)
  }

  test("noisyName always differs from the original") {
    val cols = Seq("first_name", "last_name", "country", "income", "net_worth", "id")
    cols.foreach { c =>
      assert(SchemaNoise.noisyName("t", c, 42) != c)
    }
  }

  test("noisyName is deterministic") {
    assert(SchemaNoise.noisyName("t", "country", 1) == SchemaNoise.noisyName("t", "country", 1))
  }

  test("renameMap covers all columns with unique names") {
    val cols = Seq("a_name", "b_name", "c_name", "date", "value")
    val m = SchemaNoise.renameMap("t", cols, 7)
    assert(m.keySet == cols.toSet)
    assert(m.values.toSet.size == cols.size)
  }

  test("renameMap de-duplicates collisions") {
    // Identical noisy outputs would collide; suffixing must keep them apart.
    val cols = (1 to 30).map(i => s"col_$i")
    val m = SchemaNoise.renameMap("t", cols, 3)
    assert(m.values.toSet.size == cols.size)
  }
}
