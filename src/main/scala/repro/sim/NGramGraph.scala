package repro.sim

import scala.util.hashing.MurmurHash3

/** N-gram graph models (paper Appendix B.2.2, after Giannakopoulos et al.).
  *
  * An entity is an undirected graph with one vertex per n-gram; an edge
  * connects n-grams co-occurring within a window of size n, weighted by
  * co-occurrence frequency. Graphs of individual attribute values are
  * merged into the entity graph by summing edge weights (our rendering
  * of JInsect's update operator — the relative weight structure, which
  * is what the similarity measures consume, is preserved).
  *
  * Edges are stored as a map from a packed 64-bit key (the two gram
  * hashes, order-normalized) to the weight.
  */
final case class GramGraph(edges: Map[Long, Double]) {
  def size: Int = edges.size
}

object NGramGraph {

  private def key(a: String, b: String): Long = {
    val ha = MurmurHash3.stringHash(a); val hb = MurmurHash3.stringHash(b)
    val lo = math.min(ha, hb); val hi = math.max(ha, hb)
    (hi.toLong << 32) | (lo.toLong & 0xffffffffL)
  }

  /** Build the graph of one text under the given n-gram model; window
    * size equals n as in the paper.
    */
  def build(text: String, n: Int, char: Boolean): GramGraph = {
    val grams = Tokenize.nGrams(text, n, char)
    val m = new scala.collection.mutable.HashMap[Long, Double]()
    var i = 0
    while (i < grams.length) {
      var j = i + 1
      val hi = math.min(grams.length - 1, i + n)
      while (j <= hi) {
        val k = key(grams(i), grams(j))
        m.update(k, m.getOrElse(k, 0.0) + 1.0)
        j += 1
      }
      i += 1
    }
    GramGraph(m.toMap)
  }

  /** Merge value graphs into an entity graph (sum of edge weights). */
  def merge(gs: Iterable[GramGraph]): GramGraph = {
    val m = new scala.collection.mutable.HashMap[Long, Double]()
    gs.foreach(_.edges.foreach { case (k, w) => m.update(k, m.getOrElse(k, 0.0) + w) })
    GramGraph(m.toMap)
  }

  /** Containment similarity: |common edges| / min(|Gi|, |Gj|). */
  def containment(a: GramGraph, b: GramGraph): Double = {
    if (a.size == 0 && b.size == 0) return 1.0
    if (a.size == 0 || b.size == 0) return 0.0
    val (small, large) = if (a.size <= b.size) (a, b) else (b, a)
    val common = small.edges.keysIterator.count(large.edges.contains)
    common.toDouble / small.size
  }

  /** Value similarity: Σ_e min(w)/max(w) over common edges, divided by
    * max(|Gi|, |Gj|).
    */
  def value(a: GramGraph, b: GramGraph): Double = {
    if (a.size == 0 && b.size == 0) return 1.0
    if (a.size == 0 || b.size == 0) return 0.0
    val (small, large) = if (a.size <= b.size) (a, b) else (b, a)
    var s = 0.0
    small.edges.foreach { case (k, w) =>
      large.edges.get(k).foreach(w2 => s += math.min(w, w2) / math.max(w, w2))
    }
    s / math.max(a.size, b.size)
  }

  /** Normalized value similarity: like [[value]] but divided by
    * min(|Gi|, |Gj|), mitigating imbalanced graph sizes.
    */
  def normalizedValue(a: GramGraph, b: GramGraph): Double = {
    if (a.size == 0 && b.size == 0) return 1.0
    if (a.size == 0 || b.size == 0) return 0.0
    val (small, large) = if (a.size <= b.size) (a, b) else (b, a)
    var s = 0.0
    small.edges.foreach { case (k, w) =>
      large.edges.get(k).foreach(w2 => s += math.min(w, w2) / math.max(w, w2))
    }
    s / math.min(a.size, b.size)
  }

  /** Overall similarity: average of containment, value and normalized
    * value.
    */
  def overall(a: GramGraph, b: GramGraph): Double =
    (containment(a, b) + value(a, b) + normalizedValue(a, b)) / 3.0
}
