package repro.sim

import scala.util.hashing.MurmurHash3

/** Bag (vector-space) models over character/token n-grams (paper
  * Appendix B.2.1).
  *
  * A vector is stored sparsely as sorted parallel arrays of gram-hash
  * keys and weights. Gram strings are hashed with MurmurHash3 — hashing
  * is consistent across both collections, and collisions (≈2^-32 per
  * pair) are negligible for the corpus sizes involved.
  */
final case class SparseVec(keys: Array[Int], vals: Array[Double]) {

  /** Number of non-zero dimensions. */
  def nnz: Int = keys.length

  /** L2 norm. */
  lazy val norm: Double = math.sqrt(vals.iterator.map(v => v * v).sum)

  /** Sum of weights (for Σmax-type denominators). */
  lazy val sum: Double = vals.sum
}

object Bow {

  /** Hash a gram to its dimension id. */
  def dim(gram: String): Int = MurmurHash3.stringHash(gram)

  /** Raw gram frequencies of a text under the given model. */
  def gramCounts(text: String, n: Int, char: Boolean): Map[Int, Int] = {
    val grams = Tokenize.nGrams(text, n, char)
    val m = new scala.collection.mutable.HashMap[Int, Int]()
    grams.foreach(g => m.update(dim(g), m.getOrElse(dim(g), 0) + 1))
    m.toMap
  }

  /** TF vector: frequency / total grams (paper's length normalization). */
  def tf(text: String, n: Int, char: Boolean): SparseVec = {
    val c = gramCounts(text, n, char)
    val total = c.valuesIterator.sum.toDouble
    fromMap(c.map { case (k, v) => k -> (if (total == 0) 0.0 else v / total) })
  }

  /** TF-IDF vector given per-collection document frequencies and corpus
    * size: weight = TF · max(0, log(|E| / (df + 1))). The clamp keeps
    * weights non-negative when a gram occurs in (almost) every document.
    */
  def tfIdf(text: String, n: Int, char: Boolean, df: Map[Int, Int], corpus: Int): SparseVec = {
    val c = gramCounts(text, n, char)
    val total = c.valuesIterator.sum.toDouble
    fromMap(c.map { case (k, v) =>
      val idf = math.max(0.0, math.log(corpus.toDouble / (df.getOrElse(k, 0) + 1)))
      k -> (if (total == 0) 0.0 else v / total * idf)
    })
  }

  /** Document frequencies over a collection of texts under the model. */
  def docFreq(texts: Iterable[String], n: Int, char: Boolean): Map[Int, Int] = {
    val m = new scala.collection.mutable.HashMap[Int, Int]()
    texts.foreach { t =>
      Tokenize.nGrams(t, n, char).iterator.map(dim).toSet
        .foreach((k: Int) => m.update(k, m.getOrElse(k, 0) + 1))
    }
    m.toMap
  }

  /** Build the canonical sorted sparse vector from a weight map. */
  def fromMap(m: Map[Int, Double]): SparseVec = {
    val entries = m.toArray.sortBy(_._1)
    SparseVec(entries.map(_._1), entries.map(_._2))
  }
}

/** Similarity measures over bag models (paper Appendix B.2.1). */
object BowMeasures {

  /** Merge-walk the two sorted key arrays, applying `onBoth` to shared
    * dimensions; returns (Σmin, Σmax, dot, common-dim list).
    */
  private def merge(a: SparseVec, b: SparseVec): (Double, Double, Double, Array[Int]) = {
    var i = 0; var j = 0
    var mins = 0.0; var maxs = 0.0; var dot = 0.0
    val common = Array.newBuilder[Int]
    while (i < a.nnz && j < b.nnz) {
      val ka = a.keys(i); val kb = b.keys(j)
      if (ka == kb) {
        mins += math.min(a.vals(i), b.vals(j))
        maxs += math.max(a.vals(i), b.vals(j))
        dot += a.vals(i) * b.vals(j)
        common += ka
        i += 1; j += 1
      } else if (ka < kb) { maxs += a.vals(i); i += 1 }
      else { maxs += b.vals(j); j += 1 }
    }
    while (i < a.nnz) { maxs += a.vals(i); i += 1 }
    while (j < b.nnz) { maxs += b.vals(j); j += 1 }
    (mins, maxs, dot, common.result())
  }

  /** Cosine similarity of the weighted vectors. */
  def cosine(a: SparseVec, b: SparseVec): Double = {
    if (a.nnz == 0 || b.nnz == 0) return 0.0
    if (a.norm == 0 || b.norm == 0) return 0.0
    val (_, _, dot, _) = merge(a, b)
    dot / (a.norm * b.norm)
  }

  /** Jaccard similarity over the non-zero dimension sets. */
  def jaccard(a: SparseVec, b: SparseVec): Double = {
    if (a.nnz == 0 && b.nnz == 0) return 1.0
    if (a.nnz == 0 || b.nnz == 0) return 0.0
    val (_, _, _, common) = merge(a, b)
    common.length.toDouble / (a.nnz + b.nnz - common.length)
  }

  /** Generalized Jaccard: Σmin / Σmax of the weights. */
  def generalizedJaccard(a: SparseVec, b: SparseVec): Double = {
    if (a.nnz == 0 && b.nnz == 0) return 1.0
    if (a.nnz == 0 || b.nnz == 0) return 0.0
    val (mins, maxs, _, _) = merge(a, b)
    if (maxs == 0) 0.0 else mins / maxs
  }

  /** ARCS similarity: Σ over common grams of log2 / log(DF1·DF2); rarer
    * shared grams contribute more. Unbounded above — the experiment
    * pipeline min-max normalizes all graphs, as the paper does.
    */
  def arcs(a: SparseVec, b: SparseVec, df1: Map[Int, Int], df2: Map[Int, Int]): Double = {
    if (a.nnz == 0 || b.nnz == 0) return 0.0
    val (_, _, _, common) = merge(a, b)
    var s = 0.0
    var k = 0
    while (k < common.length) {
      val prod = math.max(2L, df1.getOrElse(common(k), 1).toLong * df2.getOrElse(common(k), 1))
      s += math.log(2) / math.log(prod.toDouble)
      k += 1
    }
    s
  }
}
