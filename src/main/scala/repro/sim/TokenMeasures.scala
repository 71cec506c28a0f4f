package repro.sim

/** A token multiset with the precomputed structures every token-level
  * measure needs. Precomputing once per *entity* (instead of once per
  * pair) is what keeps the all-pairs scoring kernels cheap.
  */
final case class TokenBag(tokens: Array[String]) {
  /** Multiset counts. */
  val counts: Map[String, Int] = tokens.groupBy(identity).map { case (k, v) => k -> v.length }
  /** Distinct tokens. */
  val set: Set[String] = counts.keySet
  /** Multiset cardinality (with repetitions). */
  def size: Int = tokens.length
  /** L2 norm of the count vector. */
  val norm: Double = math.sqrt(counts.valuesIterator.map(v => v.toDouble * v).sum)
}

object TokenBag {
  def of(s: String): TokenBag = TokenBag(Tokenize.tokens(s))
}

/** Token-level schema-based similarity measures (paper Appendix B.1.2).
  *
  * Measures treat the bags as sets or multisets per their definitions;
  * distances are mapped to [0,1] similarities. Empty-vs-empty scores 1;
  * empty-vs-non-empty scores 0.
  */
object TokenMeasures {

  @inline private def guard(a: TokenBag, b: TokenBag)(body: => Double): Double =
    if (a.size == 0 && b.size == 0) 1.0 else if (a.size == 0 || b.size == 0) 0.0 else body

  /** Cosine of the bag-of-words count vectors. */
  def cosine(a: TokenBag, b: TokenBag): Double = guard(a, b) {
    val (small, large) = if (a.counts.size <= b.counts.size) (a, b) else (b, a)
    val dot = small.counts.iterator.map { case (k, v) => v.toDouble * large.counts.getOrElse(k, 0) }.sum
    dot / (a.norm * b.norm)
  }

  /** Block (L1 / Manhattan) distance over count vectors, as similarity
    * 1 − L1 / (|a| + |b|).
    */
  def block(a: TokenBag, b: TokenBag): Double = guard(a, b) {
    val l1 = (a.set ++ b.set).iterator
      .map(k => math.abs(a.counts.getOrElse(k, 0) - b.counts.getOrElse(k, 0)))
      .sum
    1.0 - l1.toDouble / (a.size + b.size)
  }

  /** Euclidean distance over count vectors, as similarity
    * 1 − d / (‖a‖ + ‖b‖).
    */
  def euclidean(a: TokenBag, b: TokenBag): Double = guard(a, b) {
    val d2 = (a.set ++ b.set).iterator.map { k =>
      val x = a.counts.getOrElse(k, 0) - b.counts.getOrElse(k, 0); x.toDouble * x
    }.sum
    1.0 - math.sqrt(d2) / (a.norm + b.norm)
  }

  /** Dice similarity over token sets: 2|∩| / (|a| + |b|). */
  def dice(a: TokenBag, b: TokenBag): Double = guard(a, b) {
    2.0 * a.set.count(b.set.contains) / (a.set.size + b.set.size)
  }

  /** Simon White similarity: Dice over multisets. */
  def simonWhite(a: TokenBag, b: TokenBag): Double = guard(a, b) {
    val inter = a.counts.iterator.map { case (k, v) => math.min(v, b.counts.getOrElse(k, 0)) }.sum
    2.0 * inter / (a.size + b.size)
  }

  /** Overlap coefficient: |∩| / min(|a|, |b|) over sets. */
  def overlap(a: TokenBag, b: TokenBag): Double = guard(a, b) {
    a.set.count(b.set.contains).toDouble / math.min(a.set.size, b.set.size)
  }

  /** Jaccard similarity over sets: |∩| / |∪|. */
  def jaccard(a: TokenBag, b: TokenBag): Double = guard(a, b) {
    val inter = a.set.count(b.set.contains)
    inter.toDouble / (a.set.size + b.set.size - inter)
  }

  /** Generalized Jaccard over multisets: Σ min / Σ max of counts. */
  def generalizedJaccard(a: TokenBag, b: TokenBag): Double = guard(a, b) {
    var mins = 0; var maxs = 0
    (a.set ++ b.set).foreach { k =>
      val x = a.counts.getOrElse(k, 0); val y = b.counts.getOrElse(k, 0)
      mins += math.min(x, y); maxs += math.max(x, y)
    }
    mins.toDouble / maxs
  }

  /** Monge-Elkan similarity: for each token of `a`, the best Smith-
    * Waterman similarity against `b`'s tokens, averaged (paper formula;
    * asymmetric by definition).
    */
  def mongeElkan(a: TokenBag, b: TokenBag): Double = guard(a, b) {
    var total = 0.0
    var i = 0
    while (i < a.tokens.length) {
      var best = 0.0
      var j = 0
      while (j < b.tokens.length) {
        val s = CharMeasures.smithWatermanCached(a.tokens(i), b.tokens(j))
        if (s > best) best = s
        j += 1
      }
      total += best
      i += 1
    }
    total / a.tokens.length
  }

  // Array-based conveniences (used by tests and DittoLite).
  def cosine(a: Array[String], b: Array[String]): Double = cosine(TokenBag(a), TokenBag(b))
  def block(a: Array[String], b: Array[String]): Double = block(TokenBag(a), TokenBag(b))
  def euclidean(a: Array[String], b: Array[String]): Double = euclidean(TokenBag(a), TokenBag(b))
  def dice(a: Array[String], b: Array[String]): Double = dice(TokenBag(a), TokenBag(b))
  def simonWhite(a: Array[String], b: Array[String]): Double = simonWhite(TokenBag(a), TokenBag(b))
  def overlap(a: Array[String], b: Array[String]): Double = overlap(TokenBag(a), TokenBag(b))
  def jaccard(a: Array[String], b: Array[String]): Double = jaccard(TokenBag(a), TokenBag(b))
  def generalizedJaccard(a: Array[String], b: Array[String]): Double =
    generalizedJaccard(TokenBag(a), TokenBag(b))
  def mongeElkan(a: Array[String], b: Array[String]): Double = mongeElkan(TokenBag(a), TokenBag(b))
}
