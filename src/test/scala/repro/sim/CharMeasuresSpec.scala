package repro.sim

import org.scalacheck.Gen
import repro.{PropSupport, SparkSpec}

class CharMeasuresSpec extends SparkSpec with PropSupport {
  import CharMeasures._

  private val genStr = Gen.choose(0, 12).flatMap(n => Gen.stringOfN(n, Gen.alphaLowerChar))

  test("levenshteinDistance known values") {
    assert(levenshteinDistance("kitten", "sitting") == 3)
    assert(levenshteinDistance("flaw", "lawn") == 2)
    assert(levenshteinDistance("", "abc") == 3)
    assert(levenshteinDistance("abc", "abc") == 0)
  }

  test("levenshtein similarity normalizes by max length") {
    assert(math.abs(levenshtein("kitten", "sitting") - (1 - 3.0 / 7)) < 1e-12)
    assert(levenshtein("abc", "abc") == 1.0)
    assert(levenshtein("abc", "xyz") == 0.0)
  }

  test("damerauLevenshtein counts a transposition as one edit") {
    // Plain Levenshtein needs 2 ops for "ab" -> "ba"; Damerau needs 1.
    assert(levenshtein("ab", "ba") == 0.0)
    assert(damerauLevenshtein("ab", "ba") == 0.5)
  }

  test("damerauLevenshtein equals levenshtein without transpositions") {
    assert(damerauLevenshtein("kitten", "sitting") == levenshtein("kitten", "sitting"))
  }

  test("jaro known values") {
    assert(math.abs(jaro("martha", "marhta") - 0.9444444444) < 1e-6)
    assert(math.abs(jaro("dixon", "dicksonx") - 0.7666666666) < 1e-6)
    assert(jaro("abc", "abc") == 1.0)
    assert(jaro("abc", "xyz") == 0.0)
  }

  test("needlemanWunch is 1 for identical and decreases with noise") {
    assert(needlemanWunch("match", "match") == 1.0)
    val close = needlemanWunch("match", "motch")
    val far = needlemanWunch("match", "zzzzz")
    assert(close > far)
    assert(far >= 0.0 && close < 1.0)
  }

  test("qGrams is trigram block similarity") {
    assert(qGrams("abcde", "abcde") == 1.0)
    // "abcd" -> {abc, bcd}; "abce" -> {abc, bce}: L1 = 2, total = 4.
    assert(math.abs(qGrams("abcd", "abce") - 0.5) < 1e-12)
  }

  test("longestCommonSubstring known values") {
    assert(math.abs(longestCommonSubstring("abcdef", "zabcy") - 3.0 / 6) < 1e-12)
    assert(longestCommonSubstring("abc", "abc") == 1.0)
    assert(longestCommonSubstring("abc", "xyz") == 0.0)
  }

  test("longestCommonSubsequence known values") {
    // lcs("abcdef","aXbYcZ") = "abc" (3); max len 6.
    assert(math.abs(longestCommonSubsequence("abcdef", "axbycz") - 0.5) < 1e-12)
    assert(longestCommonSubsequence("abc", "abc") == 1.0)
  }

  test("smithWaterman rewards a shared local region") {
    assert(smithWaterman("abc", "abc") == 1.0)
    // "abc" local alignment scores 3, normalized by min length 7.
    assert(math.abs(smithWaterman("xxabcxx", "yyabcyy") - 3.0 / 7) < 1e-12)
    assert(smithWaterman("aaa", "bbb") == 0.0)
  }

  test("all char measures handle empty strings") {
    val ms: Seq[(String, String) => Double] = Seq(
      levenshtein, damerauLevenshtein, jaro, needlemanWunch,
      qGrams, longestCommonSubstring, longestCommonSubsequence, smithWaterman)
    for (m <- ms) {
      assert(m("", "") == 1.0)
      assert(m("", "abc") == 0.0)
      assert(m("abc", "") == 0.0)
    }
  }

  test("property: all char measures are in [0,1]") {
    val ms: Seq[(String, String) => Double] = Seq(
      levenshtein, damerauLevenshtein, jaro, needlemanWunch,
      qGrams, longestCommonSubstring, longestCommonSubsequence, smithWaterman)
    forAllSamples2(genStr, genStr, n = 80) { (a, b) =>
      for (m <- ms) {
        val v = m(a, b)
        assert(v >= 0.0 && v <= 1.0, s"out of range: $v for '$a' vs '$b'")
      }
    }
  }

  test("property: identity scores 1 for all char measures") {
    val ms: Seq[(String, String) => Double] = Seq(
      levenshtein, damerauLevenshtein, jaro, needlemanWunch,
      qGrams, longestCommonSubstring, longestCommonSubsequence)
    forAllSamples(genStr, n = 40) { a =>
      for (m <- ms) assert(m(a, a) == 1.0, s"identity not 1 for '$a'")
    }
  }

  test("property: symmetric measures are symmetric") {
    val ms: Seq[(String, String) => Double] = Seq(
      levenshtein, damerauLevenshtein, jaro, qGrams,
      longestCommonSubstring, longestCommonSubsequence)
    forAllSamples2(genStr, genStr, n = 60) { (a, b) =>
      for (m <- ms) assert(math.abs(m(a, b) - m(b, a)) < 1e-12)
    }
  }
}
