package repro.sim

import repro.SparkSpec

class EmbeddingSpec extends SparkSpec {
  import Embedding._

  test("token vectors are deterministic") {
    assert(tokenVector("alpha").toSeq == tokenVector("alpha").toSeq)
  }

  test("token vectors are unit length") {
    val v = tokenVector("bravo")
    assert(math.abs(math.sqrt(v.map(x => x * x).sum) - 1.0) < 1e-9)
  }

  test("typo'd tokens stay closer than unrelated tokens (subword composition)") {
    val base = tokenVector("television")
    val typo = tokenVector("televsion")
    val other = tokenVector("quarterly")
    def cos(a: Array[Double], b: Array[Double]) = a.zip(b).map { case (x, y) => x * y }.sum
    assert(cos(base, typo) > cos(base, other))
  }

  test("pooled embeddings of identical texts are identical") {
    val a = pool(fastTextTokens("the quick brown fox"))
    val b = pool(fastTextTokens("the quick brown fox"))
    assert(a.toSeq == b.toSeq)
    assert(cosine(a, b) > 0.999999)
  }

  test("bias makes arbitrary texts moderately similar (semantic property)") {
    val a = pool(fastTextTokens("stochastic gradient descent optimizer"))
    val b = pool(fastTextTokens("restaurant phone number downtown"))
    val c = cosine(a, b)
    assert(c > 0.3 && c < 0.95, s"unexpected baseline cosine $c")
  }

  test("shared-token texts score higher than disjoint texts") {
    val base = pool(fastTextTokens("alpha bravo charlie"))
    val near = pool(fastTextTokens("alpha bravo delta"))
    val far = pool(fastTextTokens("xray yankee zulu"))
    assert(cosine(base, near) > cosine(base, far))
  }

  test("albert vectors are context sensitive") {
    // Same token, different neighbours -> different contextual vectors.
    val a = albertTokens("bank river slope")
    val b = albertTokens("bank account money")
    assert(a(0).toSeq != b(0).toSeq)
    // While fastText vectors for the token are identical regardless.
    val fa = fastTextTokens("bank river slope")
    val fb = fastTokensHead("bank account money")
    assert(fa(0).toSeq == fb.toSeq)
  }

  private def fastTokensHead(t: String): Array[Double] = fastTextTokens(t)(0)

  test("euclideanSim is 1 for identical vectors and decreases with distance") {
    val a = pool(fastTextTokens("one two three"))
    val b = pool(fastTextTokens("four five six"))
    assert(math.abs(euclideanSim(a, a) - 1.0) < 1e-9)
    assert(euclideanSim(a, b) < 1.0)
  }

  test("wordMoversSim is near 1 for identical token sets") {
    val a = fastTextTokens("alpha bravo")
    val b = fastTextTokens("bravo alpha")
    assert(wordMoversSim(a, b) > 0.999)
  }

  test("wordMoversSim is 0 when a side is empty") {
    assert(wordMoversSim(Array.empty, fastTextTokens("x")) == 0.0)
  }

  test("wordMoversSim orders near/far pairs correctly") {
    val base = fastTextTokens("data base systems")
    val near = fastTextTokens("data base system")
    val far = fastTextTokens("marble garden gnome")
    assert(wordMoversSim(base, near) > wordMoversSim(base, far))
  }
}
