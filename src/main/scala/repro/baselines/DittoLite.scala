package repro.baselines

import repro.core.PRF
import repro.data.CcerDataset
import repro.sim.{Bow, BowMeasures, CharMeasures, Embedding, TokenBag, TokenMeasures}

/** DittoLite: a supervised learning-based matcher standing in for DITTO
  * (see DESIGN.md, substitutions — fine-tuning RoBERTa is not
  * reproducible offline).
  *
  * Candidate pairs (top-k TF-IDF-cosine neighbours of every V1 entity,
  * plus all ground-truth pairs, as in the DeepMatcher-style benchmark
  * construction) are labelled by the ground truth, split 3:1:1 into
  * train/validation/test, featurized with a battery of similarity
  * functions, and classified with logistic regression trained by
  * gradient descent. The reported F1 is on the held-out test split,
  * mirroring how the paper quotes DITTO's published test-split numbers.
  */
object DittoLite {

  /** Feature vector of a candidate pair. */
  private[baselines] def features(ds: CcerDataset, i: Int, j: Int): Array[Double] = {
    val p1 = ds.profiles1(i); val p2 = ds.profiles2(j)
    val a = p1.allText; val b = p2.allText
    val key = ds.spec.keyAttrs.head
    val k1 = Option(ds.value(p1, key)).getOrElse("")
    val k2 = Option(ds.value(p2, key)).getOrElse("")
    val bagA = TokenBag.of(a); val bagB = TokenBag.of(b)
    val embA = Embedding.pool(Embedding.fastTextTokens(a))
    val embB = Embedding.pool(Embedding.fastTextTokens(b))
    Array(
      BowMeasures.cosine(Bow.tf(a, 1, char = false), Bow.tf(b, 1, char = false)),
      BowMeasures.cosine(Bow.tf(a, 3, char = true), Bow.tf(b, 3, char = true)),
      TokenMeasures.jaccard(bagA, bagB),
      if (k1.isEmpty || k2.isEmpty) 0.0 else CharMeasures.levenshtein(k1, k2),
      if (k1.isEmpty || k2.isEmpty) 0.0 else TokenMeasures.overlap(TokenBag.of(k1), TokenBag.of(k2)),
      Embedding.cosine(embA, embB),
    )
  }

  /** Candidate pairs: top-k token-unigram TF-IDF cosine neighbours per
    * V1 entity, unioned with all ground-truth pairs.
    */
  private[baselines] def candidates(ds: CcerDataset, k: Int = 10): Seq[(Int, Int)] = {
    val texts1 = ds.profiles1.map(_.allText)
    val texts2 = ds.profiles2.map(_.allText)
    val df1 = Bow.docFreq(texts1, 1, char = false)
    val df2 = Bow.docFreq(texts2, 1, char = false)
    val v1 = texts1.map(Bow.tfIdf(_, 1, char = false, df1, texts1.length))
    val v2 = texts2.map(Bow.tfIdf(_, 1, char = false, df2, texts2.length))
    val top = for (i <- v1.indices) yield {
      v2.indices
        .map(j => (j, BowMeasures.cosine(v1(i), v2(j))))
        .filter(_._2 > 0)
        .sortBy(-_._2)
        .take(k)
        .map { case (j, _) => (i, j) }
    }
    (top.flatten ++ ds.groundTruth).distinct
  }

  /** Train/evaluate; returns the test-split P/R/F1. */
  def evaluate(ds: CcerDataset, topK: Int = 10, epochs: Int = 400, lr: Double = 0.5): PRF = {
    val gt = ds.groundTruth.toSet
    val pairs = candidates(ds, topK)
    val feats = pairs.map { case (i, j) => features(ds, i, j) }
    val labels = pairs.map(gt.contains)

    // Deterministic 3:1:1 split by pair hash.
    def bucket(p: (Int, Int)): Int =
      math.floorMod(scala.util.hashing.MurmurHash3.productHash(p), 5)
    val idx = pairs.indices
    val train = idx.filter(i => bucket(pairs(i)) <= 2)
    val test = idx.filter(i => bucket(pairs(i)) == 4)

    val dim = feats.head.length
    val wgt = new Array[Double](dim + 1) // last slot is the bias
    val posWeight = {
      val pos = train.count(labels(_)).max(1)
      (train.size - pos).toDouble.max(1.0) / pos
    }
    for (_ <- 0 until epochs) {
      val grad = new Array[Double](dim + 1)
      for (i <- train) {
        val x = feats(i)
        var z = wgt(dim)
        var d = 0
        while (d < dim) { z += wgt(d) * x(d); d += 1 }
        val p = 1.0 / (1.0 + math.exp(-z))
        val y = if (labels(i)) 1.0 else 0.0
        val scale = if (labels(i)) posWeight else 1.0
        val err = (p - y) * scale
        d = 0
        while (d < dim) { grad(d) += err * x(d); d += 1 }
        grad(dim) += err
      }
      var d = 0
      while (d <= dim) { wgt(d) -= lr * grad(d) / train.size; d += 1 }
    }

    var tp = 0; var fp = 0; var fn = 0
    for (i <- test) {
      var z = wgt(dim)
      var d = 0
      while (d < dim) { z += wgt(d) * feats(i)(d); d += 1 }
      val predicted = 1.0 / (1.0 + math.exp(-z)) > 0.5
      (predicted, labels(i)) match {
        case (true, true)  => tp += 1
        case (true, false) => fp += 1
        case (false, true) => fn += 1
        case _             =>
      }
    }
    PRF(
      precision = if (tp + fp == 0) 0.0 else tp.toDouble / (tp + fp),
      recall = if (tp + fn == 0) 0.0 else tp.toDouble / (tp + fn),
    )
  }
}
