package repro.sim

import scala.util.hashing.MurmurHash3

/** Pseudo-embeddings standing in for fastText and ALBERT (see DESIGN.md,
  * substitutions): deterministic hash-based random projections.
  *
  * Every gram hash seeds a fixed pseudo-random Gaussian direction; a
  * token vector is the normalized sum of its character-3/4-gram vectors
  * plus a whole-token vector (fastText's subword composition — typo'd
  * tokens stay close, and there is no out-of-vocabulary failure mode).
  * The "ALBERT" variant additionally mixes each token with the average
  * of its window-1 neighbours before pooling (context sensitivity).
  *
  * All token vectors share a common bias direction (`BiasWeight`), so
  * arbitrary texts score moderately-high cosine — the property of real
  * pre-trained embeddings that drives the paper's semantic-weights
  * findings (high optimal thresholds, weak discrimination in
  * schema-agnostic settings).
  */
object Embedding {

  /** Embedding dimensionality (paper: 300/768; scaled for CPU budget —
    * only relative geometry matters to the findings).
    */
  val Dim = 64

  /** Relative strength of the shared bias direction. Calibrated so that
    * token-level baseline cosine is ≈0.5 and pooled-text baseline cosine
    * is ≈0.7–0.9 (rising with text length), matching the paper's
    * observation that semantic similarities are relatively high for most
    * pairs — especially in schema-agnostic (long-text) settings.
    */
  val BiasWeight = 0.5

  /** Number of shared "concept" directions and how strongly a token is
    * pulled toward its concept. Distinct tokens hashing to the same
    * concept become embedding-similar — the semantic-relatedness-is-not-
    * identity confusion that makes real pre-trained embeddings weaker
    * discriminators for ER than syntactic models (the paper's semantic-
    * weights finding). This perturbs the similarity *ordering*, which
    * min-max normalization cannot undo.
    */
  val ConceptCount = 150
  val ConceptWeight = 0.55

  private val bias: Array[Double] = {
    val v = gaussian(0x5eedb1a5, Dim)
    normalize(v); v
  }

  /** SplitMix64-derived standard Gaussian vector for a given seed. */
  private def gaussian(seed: Int, dim: Int): Array[Double] = {
    var s = seed.toLong * 0x9e3779b97f4a7c15L + 0x1234567887654321L
    def next(): Long = {
      s += 0x9e3779b97f4a7c15L
      var z = s
      z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
      z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
      z ^ (z >>> 31)
    }
    val out = new Array[Double](dim)
    var i = 0
    while (i < dim) {
      // Box-Muller from two uniform draws.
      val u1 = (next() >>> 11).toDouble / (1L << 53).toDouble
      val u2 = (next() >>> 11).toDouble / (1L << 53).toDouble
      out(i) = math.sqrt(-2.0 * math.log(math.max(u1, 1e-300))) * math.cos(2 * math.Pi * u2)
      i += 1
    }
    out
  }

  private def normalize(v: Array[Double]): Unit = {
    var n = 0.0; var i = 0
    while (i < v.length) { n += v(i) * v(i); i += 1 }
    n = math.sqrt(n)
    if (n > 0) { i = 0; while (i < v.length) { v(i) /= n; i += 1 } }
  }

  private def addInto(acc: Array[Double], v: Array[Double], scale: Double): Unit = {
    var i = 0
    while (i < acc.length) { acc(i) += v(i) * scale; i += 1 }
  }

  // Token vectors are pure functions of the token; memoize per thread to
  // keep cross-join UDFs cheap without sharing mutable state.
  private val tokenCache = new ThreadLocal[java.util.HashMap[String, Array[Double]]] {
    override def initialValue() = new java.util.HashMap[String, Array[Double]]()
  }

  /** Content (pre-bias) vector of a token: normalized sum of subword and
    * whole-token hash directions.
    */
  def tokenVector(token: String): Array[Double] = {
    val cache = tokenCache.get()
    val hit = cache.get(token)
    if (hit != null) return hit
    val acc = new Array[Double](Dim)
    addInto(acc, gaussian(MurmurHash3.stringHash(token), Dim), 1.0)
    for (n <- 3 to 4; g <- Tokenize.charNGrams(token, n))
      addInto(acc, gaussian(MurmurHash3.stringHash(g), Dim), 0.5)
    normalize(acc)
    // Pull toward the token's shared concept direction (see ConceptCount).
    val concept = gaussian(math.floorMod(MurmurHash3.stringHash(token), ConceptCount), Dim)
    normalize(concept)
    var k = 0
    while (k < Dim) { acc(k) = (1 - ConceptWeight) * acc(k) + ConceptWeight * concept(k); k += 1 }
    normalize(acc)
    if (cache.size > 200000) cache.clear()
    cache.put(token, acc)
    acc
  }

  /** Biased token vector, unit length. */
  private def biased(content: Array[Double]): Array[Double] = {
    val v = new Array[Double](Dim)
    addInto(v, content, 1.0 - BiasWeight)
    addInto(v, bias, BiasWeight)
    normalize(v)
    v
  }

  /** fastText-like token vectors for a text (one per word token). */
  def fastTextTokens(text: String): Array[Array[Double]] =
    Tokenize.tokens(text).map(t => biased(tokenVector(t)))

  /** ALBERT-like contextual token vectors: each token mixed with the
    * average of its adjacent tokens before biasing.
    */
  def albertTokens(text: String): Array[Array[Double]] = {
    val ts = Tokenize.tokens(text)
    val raw = ts.map(tokenVector)
    raw.indices.toArray.map { i =>
      val ctx = new Array[Double](Dim)
      addInto(ctx, raw(i), 0.7)
      var cnt = 0
      if (i > 0) { addInto(ctx, raw(i - 1), 0.15); cnt += 1 }
      if (i < raw.length - 1) { addInto(ctx, raw(i + 1), 0.15); cnt += 1 }
      normalize(ctx)
      biased(ctx)
    }
  }

  /** Mean-pooled text embedding, unit length (empty text → zero vector). */
  def pool(tokenVecs: Array[Array[Double]]): Array[Double] = {
    val acc = new Array[Double](Dim)
    tokenVecs.foreach(addInto(acc, _, 1.0))
    normalize(acc)
    acc
  }

  /** Cosine similarity of two pooled embeddings (0 for zero vectors). */
  def cosine(a: Array[Double], b: Array[Double]): Double = {
    var d = 0.0; var i = 0
    while (i < Dim) { d += a(i) * b(i); i += 1 }
    d
  }

  /** Euclidean similarity 1 / (1 + ‖a − b‖). */
  def euclideanSim(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < Dim) { val x = a(i) - b(i); s += x * x; i += 1 }
    1.0 / (1.0 + math.sqrt(s))
  }

  /** Word Mover's similarity 1 / (1 + relaxedWMD), where relaxedWMD is
    * the symmetric relaxed word mover's distance: for each token, the
    * distance to its nearest counterpart, averaged; the max of both
    * directions. Token lists are capped for the all-pairs budget.
    */
  def wordMoversSim(a: Array[Array[Double]], b: Array[Array[Double]], cap: Int = 24): Double = {
    if (a.isEmpty || b.isEmpty) return 0.0
    val ta = if (a.length > cap) a.take(cap) else a
    val tb = if (b.length > cap) b.take(cap) else b
    def direction(xs: Array[Array[Double]], ys: Array[Array[Double]]): Double = {
      var total = 0.0
      var i = 0
      while (i < xs.length) {
        var best = Double.MaxValue
        var j = 0
        while (j < ys.length) {
          var s = 0.0; var k = 0
          while (k < Dim) { val d = xs(i)(k) - ys(j)(k); s += d * d; k += 1 }
          if (s < best) best = s
          j += 1
        }
        total += math.sqrt(best)
        i += 1
      }
      total / xs.length
    }
    val wmd = math.max(direction(ta, tb), direction(tb, ta))
    1.0 / (1.0 + wmd)
  }
}
