package repro.sim

import repro.SparkSpec

class TokenizeSpec extends SparkSpec {

  test("tokens lowercases and splits on non-alphanumerics") {
    assert(Tokenize.tokens("Joe  Biden, Jr.").toSeq == Seq("joe", "biden", "jr"))
  }

  test("tokens keeps digits and mixed alphanumerics") {
    assert(Tokenize.tokens("TX-4821B rev2").toSeq == Seq("tx", "4821b", "rev2"))
  }

  test("tokens of null or empty is empty") {
    assert(Tokenize.tokens(null).isEmpty)
    assert(Tokenize.tokens("  ").isEmpty)
  }

  test("charNGrams matches the paper's Joe Biden example") {
    assert(Tokenize.charNGrams("Joe Biden", 3).toSeq ==
      Seq("joe", "oe ", "e b", " bi", "bid", "ide", "den"))
  }

  test("charNGrams of a short string is the string itself") {
    assert(Tokenize.charNGrams("ab", 3).toSeq == Seq("ab"))
  }

  test("charNGrams trims and lowercases") {
    assert(Tokenize.charNGrams("  AB  ", 2).toSeq == Seq("ab"))
  }

  test("tokenNGrams n=1 equals tokens") {
    assert(Tokenize.tokenNGrams("alpha beta gamma", 1).toSeq == Seq("alpha", "beta", "gamma"))
  }

  test("tokenNGrams n=2 produces the paper's bigram") {
    assert(Tokenize.tokenNGrams("Joe Biden", 2).toSeq == Seq("joe biden"))
    assert(Tokenize.tokenNGrams("a b c", 2).toSeq == Seq("a b", "b c"))
  }

  test("tokenNGrams shorter than n yields one joined gram") {
    assert(Tokenize.tokenNGrams("solo", 3).toSeq == Seq("solo"))
    assert(Tokenize.tokenNGrams("", 2).isEmpty)
  }

  test("nGrams dispatches on the char flag") {
    assert(Tokenize.nGrams("abc", 2, char = true).toSeq == Seq("ab", "bc"))
    assert(Tokenize.nGrams("a b", 1, char = false).toSeq == Seq("a", "b"))
  }
}
