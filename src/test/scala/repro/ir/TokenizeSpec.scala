package repro.ir

import org.scalatest.funsuite.AnyFunSuite

class TokenizeSpec extends AnyFunSuite {
  test("lowercases and splits on non-alphanumerics") {
    assert(Tokenize.tokens("Hello, World!") == Seq("hello", "world"))
  }
  test("keeps digits") {
    assert(Tokenize.tokens("IPA 7.2% abv") == Seq("ipa", "7", "2", "abv"))
  }
  test("null and empty are empty") {
    assert(Tokenize.tokens(null).isEmpty)
    assert(Tokenize.tokens("").isEmpty)
    assert(Tokenize.tokens("!!! --- ???").isEmpty)
  }
  test("sentence joins with single spaces") {
    assert(Tokenize.sentence("  The   Quick--Brown fox ") == "the quick brown fox")
  }
  test("idempotent on already-clean text") {
    val s = "charlie brown coldplay 2011"
    assert(Tokenize.sentence(s) == s)
  }
}
