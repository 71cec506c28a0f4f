package repro.sim

import repro.SparkSpec

class BowSpec extends SparkSpec {

  test("tf vector weights sum to 1 for non-empty text") {
    val v = Bow.tf("abc abd", 1, char = false)
    assert(math.abs(v.vals.sum - 1.0) < 1e-12)
  }

  test("tf counts repeated grams") {
    val v = Bow.tf("x x y", 1, char = false)
    val m = v.keys.zip(v.vals).toMap
    assert(math.abs(m(Bow.dim("x")) - 2.0 / 3) < 1e-12)
    assert(math.abs(m(Bow.dim("y")) - 1.0 / 3) < 1e-12)
  }

  test("docFreq counts documents, not occurrences") {
    val df = Bow.docFreq(Seq("x x", "x y", "z"), 1, char = false)
    assert(df(Bow.dim("x")) == 2)
    assert(df(Bow.dim("y")) == 1)
    assert(df(Bow.dim("z")) == 1)
  }

  test("tfIdf down-weights corpus-wide grams to zero (idf clamp)") {
    val texts = Seq("common alpha", "common beta", "common gamma")
    val df = Bow.docFreq(texts, 1, char = false)
    val v = Bow.tfIdf("common alpha", 1, char = false, df, texts.size)
    val m = v.keys.zip(v.vals).toMap
    // "common" appears in all 3 docs: idf = max(0, log(3/4)) = 0.
    assert(m(Bow.dim("common")) == 0.0)
    assert(m(Bow.dim("alpha")) > 0.0)
  }

  test("sparse vectors keep keys sorted") {
    val v = Bow.tf("delta alpha charlie bravo", 1, char = false)
    assert(v.keys.toSeq == v.keys.sorted.toSeq)
  }

  test("cosine of identical vectors is 1") {
    val v = Bow.tf("a b c d", 1, char = false)
    assert(math.abs(BowMeasures.cosine(v, v) - 1.0) < 1e-12)
  }

  test("cosine of disjoint vectors is 0") {
    val a = Bow.tf("a b", 1, char = false)
    val b = Bow.tf("c d", 1, char = false)
    assert(BowMeasures.cosine(a, b) == 0.0)
  }

  test("jaccard over dimensions") {
    val a = Bow.tf("a b", 1, char = false)
    val b = Bow.tf("b c", 1, char = false)
    assert(math.abs(BowMeasures.jaccard(a, b) - 1.0 / 3) < 1e-12)
  }

  test("generalizedJaccard of identical vectors is 1, of disjoint is 0") {
    val a = Bow.tf("a b c", 1, char = false)
    val b = Bow.tf("x y", 1, char = false)
    assert(math.abs(BowMeasures.generalizedJaccard(a, a) - 1.0) < 1e-12)
    assert(BowMeasures.generalizedJaccard(a, b) == 0.0)
  }

  test("arcs rewards rare shared grams more than common ones") {
    val df1 = Map(Bow.dim("rare") -> 1, Bow.dim("common") -> 50)
    val df2 = Map(Bow.dim("rare") -> 1, Bow.dim("common") -> 50)
    val rare = BowMeasures.arcs(
      Bow.tf("rare", 1, char = false), Bow.tf("rare", 1, char = false), df1, df2)
    val common = BowMeasures.arcs(
      Bow.tf("common", 1, char = false), Bow.tf("common", 1, char = false), df1, df2)
    assert(rare > common)
  }

  test("arcs guards the df product at 2 (no division by log 1)") {
    val v = Bow.tf("unique", 1, char = false)
    val s = BowMeasures.arcs(v, v, Map.empty, Map.empty)
    assert(!s.isInfinite && !s.isNaN && s > 0)
  }

  test("char-gram vector of the Joe Biden example has seven dimensions") {
    val v = Bow.tf("Joe Biden", 3, char = true)
    assert(v.nnz == 7)
  }
}
