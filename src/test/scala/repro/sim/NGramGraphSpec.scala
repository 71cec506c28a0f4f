package repro.sim

import repro.SparkSpec

class NGramGraphSpec extends SparkSpec {

  test("graph of empty text is empty") {
    assert(NGramGraph.build("", 3, char = true).size == 0)
  }

  test("char 3-gram graph of Joe Biden connects co-occurring grams") {
    // 7 grams, window 3: edges = 6+6+5... pairs (i,j) with j-i <= 3:
    // i=0:3, i=1:3, i=2:3, i=3:3, i=4:2, i=5:1 -> 15 distinct pairs.
    val g = NGramGraph.build("Joe Biden", 3, char = true)
    assert(g.size == 15)
  }

  test("edge weights count co-occurrence frequency") {
    // "ababa": 1-grams a,b,a,b,a; window 1: consecutive pairs (a,b) x4.
    val g = NGramGraph.build("ababa", 1, char = true)
    assert(g.size == 1)
    assert(g.edges.values.head == 4.0)
  }

  test("merge sums edge weights across value graphs") {
    val a = NGramGraph.build("ab", 1, char = true)
    val b = NGramGraph.build("ab", 1, char = true)
    val m = NGramGraph.merge(Seq(a, b))
    assert(m.size == 1)
    assert(m.edges.values.head == 2.0)
  }

  test("containment is 1 for identical graphs, 0 for disjoint") {
    val a = NGramGraph.build("abcdef", 2, char = true)
    val b = NGramGraph.build("uvwxyz", 2, char = true)
    assert(NGramGraph.containment(a, a) == 1.0)
    assert(NGramGraph.containment(a, b) == 0.0)
  }

  test("containment normalizes by the smaller graph") {
    val small = NGramGraph.build("abcd", 2, char = true)
    val large = NGramGraph.build("abcdwxyz", 2, char = true)
    // All of small's edges appear in large.
    assert(NGramGraph.containment(small, large) == 1.0)
  }

  test("value is containment-scaled by weight ratios and the larger size") {
    val a = NGramGraph.build("abcd", 2, char = true)
    val b = NGramGraph.build("abcdwxyz", 2, char = true)
    val v = NGramGraph.value(a, b)
    // common edges have equal weights -> sum of ratios = |common| = |a|;
    // divided by max size = |b|.
    assert(math.abs(v - a.size.toDouble / b.size) < 1e-12)
  }

  test("normalizedValue divides by the smaller size") {
    val a = NGramGraph.build("abcd", 2, char = true)
    val b = NGramGraph.build("abcdwxyz", 2, char = true)
    assert(math.abs(NGramGraph.normalizedValue(a, b) - 1.0) < 1e-12)
  }

  test("overall is the average of the three measures") {
    val a = NGramGraph.build("abcde", 2, char = true)
    val b = NGramGraph.build("abcxy", 2, char = true)
    val expected = (NGramGraph.containment(a, b) + NGramGraph.value(a, b) +
      NGramGraph.normalizedValue(a, b)) / 3.0
    assert(math.abs(NGramGraph.overall(a, b) - expected) < 1e-12)
  }

  test("all graph measures are symmetric and in [0,1]") {
    val texts = Seq("alpha bravo", "alpha delta", "zulu", "alpha bravo charlie")
    for (x <- texts; y <- texts; n <- Seq(1, 2); char <- Seq(true, false)) {
      val a = NGramGraph.build(x, n, char); val b = NGramGraph.build(y, n, char)
      for (m <- Seq[(GramGraph, GramGraph) => Double](
          NGramGraph.containment, NGramGraph.value, NGramGraph.normalizedValue, NGramGraph.overall)) {
        val v = m(a, b)
        assert(v >= 0.0 && v <= 1.0)
        assert(math.abs(v - m(b, a)) < 1e-12)
      }
    }
  }
}
