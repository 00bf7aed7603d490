package repro.text

import org.scalatest.funsuite.AnyFunSuite

class TokenizerSpec extends AnyFunSuite {

  test("splits snake_case") {
    assert(Tokenizer.tokens("first_name") == Seq("first", "name"))
  }

  test("splits camelCase") {
    assert(Tokenizer.tokens("firstName") == Seq("first", "name"))
  }

  test("splits PascalCase") {
    assert(Tokenizer.tokens("FirstName") == Seq("first", "name"))
  }

  test("handles acronym boundaries") {
    assert(Tokenizer.tokens("XMLParser") == Seq("xml", "parser"))
  }

  test("lowercases output") {
    assert(Tokenizer.tokens("COUNTRY") == Seq("country"))
  }

  test("splits on hyphens and dots") {
    assert(Tokenizer.tokens("start-date.value") == Seq("start", "date", "value"))
  }

  test("empty and null are empty") {
    assert(Tokenizer.tokens("") == Seq.empty)
    assert(Tokenizer.tokens(null) == Seq.empty)
  }

  test("keeps digits attached by default") {
    assert(Tokenizer.tokens("addr2") == Seq("addr2"))
  }

  test("tokensWithDigits splits digit runs") {
    assert(Tokenizer.tokensWithDigits("addr2") == Seq("addr", "2"))
  }

  test("table-prefixed names split fully") {
    assert(Tokenizer.tokens("prospect_FirstName") == Seq("prospect", "first", "name"))
  }

  test("single word passes through") {
    assert(Tokenizer.tokens("country") == Seq("country"))
  }
}
