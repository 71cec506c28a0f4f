package repro.sim

import org.scalacheck.Gen
import repro.{PropSupport, SparkSpec}

class TokenMeasuresSpec extends SparkSpec with PropSupport {
  import TokenMeasures._

  private def arr(s: String): Array[String] = s.split(' ').filter(_.nonEmpty)

  test("cosine of identical bags is 1") {
    assert(math.abs(cosine(arr("a b c"), arr("a b c")) - 1.0) < 1e-12)
  }

  test("cosine of disjoint bags is 0") {
    assert(cosine(arr("a b"), arr("c d")) == 0.0)
  }

  test("cosine respects counts") {
    // a=(2,0), b=(1,1): cos = 2 / (2 * sqrt(2)).
    assert(math.abs(cosine(arr("x x"), arr("x y")) - 2.0 / (2 * math.sqrt(2))) < 1e-12)
  }

  test("block distance similarity") {
    // counts differ by 2 over total 4 -> 1 - 2/4.
    assert(math.abs(block(arr("a b"), arr("a c")) - 0.5) < 1e-12)
    assert(block(arr("a"), arr("a")) == 1.0)
  }

  test("euclidean similarity is 1 for identical and below 1 otherwise") {
    assert(euclidean(arr("a b"), arr("a b")) == 1.0)
    assert(euclidean(arr("a"), arr("b")) < 1.0)
  }

  test("dice on sets") {
    // {a,b} vs {b,c}: 2*1/(2+2).
    assert(math.abs(dice(arr("a b"), arr("b c")) - 0.5) < 1e-12)
  }

  test("simonWhite is dice over multisets") {
    // [a,a,b] vs [a,b,b]: inter = min counts = 1+1 = 2 -> 2*2/6.
    assert(math.abs(simonWhite(arr("a a b"), arr("a b b")) - 2.0 / 3) < 1e-12)
    // dice (set view) would be 1.0 here:
    assert(dice(arr("a a b"), arr("a b b")) == 1.0)
  }

  test("overlap coefficient uses the smaller set") {
    assert(overlap(arr("a b"), arr("a b c d")) == 1.0)
    assert(math.abs(overlap(arr("a x"), arr("a b c d")) - 0.5) < 1e-12)
  }

  test("jaccard on sets") {
    assert(math.abs(jaccard(arr("a b"), arr("b c")) - 1.0 / 3) < 1e-12)
    assert(jaccard(arr("a"), arr("a")) == 1.0)
  }

  test("generalizedJaccard respects counts") {
    // [a,a,b] vs [a,b,b]: min=1+1=2, max=2+2=4.
    assert(math.abs(generalizedJaccard(arr("a a b"), arr("a b b")) - 0.5) < 1e-12)
  }

  test("mongeElkan is 1 when every token of a appears in b") {
    assert(mongeElkan(arr("abc def"), arr("def abc xyz")) == 1.0)
  }

  test("mongeElkan is asymmetric by definition") {
    val a = arr("abc"); val b = arr("abc zzz")
    assert(mongeElkan(a, b) == 1.0)
    assert(mongeElkan(b, a) < 1.0)
  }

  test("all token measures handle empty bags") {
    val ms: Seq[(Array[String], Array[String]) => Double] = Seq(
      cosine, block, euclidean, dice, simonWhite, overlap, jaccard,
      generalizedJaccard, mongeElkan)
    for (m <- ms) {
      assert(m(Array.empty, Array.empty) == 1.0)
      assert(m(Array.empty, arr("a")) == 0.0)
      assert(m(arr("a"), Array.empty) == 0.0)
    }
  }

  private val genBag: Gen[Array[String]] =
    Gen.choose(0, 8).flatMap(n => Gen.listOfN(n, Gen.oneOf("a", "b", "c", "d", "ee", "ff"))).map(_.toArray)

  test("property: all token measures are in [0,1]") {
    val ms: Seq[(Array[String], Array[String]) => Double] = Seq(
      cosine, block, euclidean, dice, simonWhite, overlap, jaccard,
      generalizedJaccard, mongeElkan)
    forAllSamples2(genBag, genBag, n = 80) { (a, b) =>
      for (m <- ms) {
        val v = m(a, b)
        assert(v >= -1e-12 && v <= 1.0 + 1e-12, s"out of range: $v")
      }
    }
  }

  test("property: identity scores 1 for non-empty bags") {
    val ms: Seq[(Array[String], Array[String]) => Double] = Seq(
      cosine, block, euclidean, dice, simonWhite, overlap, jaccard, generalizedJaccard)
    forAllSamples(genBag.suchThat(_.nonEmpty), n = 40) { a =>
      for (m <- ms) assert(math.abs(m(a, a) - 1.0) < 1e-9)
    }
  }

  test("TokenBag precomputations match direct definitions") {
    val b = TokenBag(arr("a a b c"))
    assert(b.counts == Map("a" -> 2, "b" -> 1, "c" -> 1))
    assert(b.set == Set("a", "b", "c"))
    assert(b.size == 4)
    assert(math.abs(b.norm - math.sqrt(6)) < 1e-12)
  }
}
