package repro.sim

import org.apache.spark.sql.SparkSession
import repro.core.SimGraph
import repro.data.CcerDataset

/** The paper's four types of edge-weight origin (§4 taxonomy). */
sealed trait WeightType { def code: String; def label: String }
case object SBSyn extends WeightType { val code = "sb-syn"; val label = "Schema-based syntactic" }
case object SASyn extends WeightType { val code = "sa-syn"; val label = "Schema-agnostic syntactic" }
case object SBSem extends WeightType { val code = "sb-sem"; val label = "Schema-based semantic" }
case object SASem extends WeightType { val code = "sa-sem"; val label = "Schema-agnostic semantic" }

object WeightType {
  val all: Seq[WeightType] = Seq(SBSyn, SASyn, SBSem, SASem)
}

/** Identity of one similarity graph. */
final case class GraphMeta(
    dataset: String,
    weightType: WeightType,
    function: String,
)

/** Controls how much of the taxonomy to enumerate (tests shrink this).
  *
  * @param charNs   character n-gram sizes for vector/graph models
  * @param tokenNs  token n-gram sizes for vector/graph models
  * @param families which weight types to produce
  */
final case class SimConfig(
    charNs: Seq[Int] = Seq(2, 3, 4),
    tokenNs: Seq[Int] = Seq(1, 2, 3),
    families: Set[WeightType] = WeightType.all.toSet,
)

/** Spark pipeline producing every similarity graph of the paper's
  * taxonomy for a dataset (§4, Figure 6).
  *
  * Per-entity representations (token bags, n-gram vectors, n-gram
  * graphs, embeddings) are computed once and broadcast; the quadratic
  * all-pairs scoring — the expensive part, since the paper applies no
  * blocking — runs as a Spark job over the pair-index range, one family
  * of measures per pass. Graphs are handed to the callback one at a
  * time so the driver never holds more than one family's edges.
  */
object SimFunctions {

  /** Number of similarity functions enumerated for a dataset spec. */
  def functionCount(keyAttrs: Int, cfg: SimConfig = SimConfig()): Int = {
    val models = cfg.charNs.length + cfg.tokenNs.length
    var c = 0
    if (cfg.families(SBSyn)) c += keyAttrs * 16
    if (cfg.families(SASyn)) c += models * 6 + models * 4
    if (cfg.families(SBSem)) c += keyAttrs * 6
    if (cfg.families(SASem)) c += 6
    c
  }

  /** Enumerate all similarity graphs for `ds`, invoking `f` for each. */
  def forEachGraph(
      spark: SparkSession,
      ds: CcerDataset,
      cfg: SimConfig = SimConfig(),
  )(f: (GraphMeta, SimGraph) => Unit): Unit = {
    if (cfg.families(SBSyn)) schemaBasedSyntactic(spark, ds)(f)
    if (cfg.families(SASyn)) schemaAgnosticSyntactic(spark, ds, cfg)(f)
    if (cfg.families(SBSem)) schemaBasedSemantic(spark, ds)(f)
    if (cfg.families(SASem)) schemaAgnosticSemantic(spark, ds)(f)
  }

  // ------------------------------------------------------------------
  // All-pairs scoring driver
  // ------------------------------------------------------------------

  /** Score every (i, j) pair with `kernel` (null = skip pair; per-measure
    * non-positive scores are dropped when the graphs are built) and
    * return one edge array per measure.
    */
  def pairScores(
      spark: SparkSession,
      n1: Int,
      n2: Int,
      nMeasures: Int,
  )(kernel: (Int, Int) => Array[Double]): IndexedSeq[Array[(Int, Int, Double)]] = {
    val total = n1.toLong * n2
    val slices = math.min(64, math.max(1, (total / 4096).toInt))
    val rows = spark
      .range(0, total, 1, slices)
      .rdd
      .mapPartitions { iter =>
        iter.flatMap { idxBoxed =>
          val idx = idxBoxed.longValue()
          val i = (idx / n2).toInt
          val j = (idx % n2).toInt
          val s = kernel(i, j)
          if (s == null) Iterator.empty
          else {
            var any = false; var k = 0
            while (k < s.length && !any) { if (s(k) > 0.0) any = true; k += 1 }
            if (any) Iterator.single((i, j, s)) else Iterator.empty
          }
        }
      }
      .collect()
    (0 until nMeasures).map { k =>
      val b = Array.newBuilder[(Int, Int, Double)]
      var r = 0
      while (r < rows.length) {
        val (i, j, s) = rows(r)
        if (s(k) > 0.0) b += ((i, j, s(k)))
        r += 1
      }
      b.result()
    }
  }

  /** One specific graph: schema-agnostic TF-IDF cosine for a single
    * n-gram model (the configuration Table 7 varies for UMC).
    */
  def saTfIdfCosine(spark: SparkSession, ds: CcerDataset, n: Int, char: Boolean): SimGraph = {
    val sc = spark.sparkContext
    val texts1 = ds.profiles1.map(_.allText).toArray
    val texts2 = ds.profiles2.map(_.allText).toArray
    val df1 = Bow.docFreq(texts1, n, char)
    val df2 = Bow.docFreq(texts2, n, char)
    val v1 = texts1.map(Bow.tfIdf(_, n, char, df1, texts1.length))
    val v2 = texts2.map(Bow.tfIdf(_, n, char, df2, texts2.length))
    val b1 = sc.broadcast(v1); val b2 = sc.broadcast(v2)
    val edges = pairScores(spark, texts1.length, texts2.length, 1) { (i, j) =>
      Array(BowMeasures.cosine(b1.value(i), b2.value(j)))
    }.head
    b1.destroy(); b2.destroy()
    SimGraph.fromEdges(texts1.length, texts2.length, edges)
  }

  // ------------------------------------------------------------------
  // Schema-based syntactic: 16 measures per key attribute
  // ------------------------------------------------------------------

  /** The 7 character-level + 9 token-level measure names, in kernel order. */
  val sbSynMeasures: IndexedSeq[String] = IndexedSeq(
    "levenshtein", "damerau-levenshtein", "jaro", "needleman-wunch",
    "qgrams", "lc-substring", "lc-subsequence",
    "cosine", "block", "euclidean", "dice", "simon-white", "overlap",
    "jaccard", "gen-jaccard", "monge-elkan",
  )

  def schemaBasedSyntactic(spark: SparkSession, ds: CcerDataset)(
      f: (GraphMeta, SimGraph) => Unit
  ): Unit = {
    val sc = spark.sparkContext
    for (attr <- ds.spec.keyAttrs) {
      val raw1 = ds.profiles1.map(p => ds.value(p, attr)).toArray
      val raw2 = ds.profiles2.map(p => ds.value(p, attr)).toArray
      val bags1 = raw1.map(s => if (s == null) null else TokenBag.of(s))
      val bags2 = raw2.map(s => if (s == null) null else TokenBag.of(s))
      val tri1 = raw1.map(s => if (s == null) null else CharMeasures.triProfile(s))
      val tri2 = raw2.map(s => if (s == null) null else CharMeasures.triProfile(s))
      val bRaw1 = sc.broadcast(raw1); val bRaw2 = sc.broadcast(raw2)
      val bBag1 = sc.broadcast(bags1); val bBag2 = sc.broadcast(bags2)
      val bTri1 = sc.broadcast(tri1); val bTri2 = sc.broadcast(tri2)

      val perMeasure = pairScores(spark, raw1.length, raw2.length, 16) { (i, j) =>
        val s1 = bRaw1.value(i); val s2 = bRaw2.value(j)
        if (s1 == null || s2 == null) null
        else {
          val t1 = bBag1.value(i); val t2 = bBag2.value(j)
          Array(
            CharMeasures.levenshtein(s1, s2),
            CharMeasures.damerauLevenshtein(s1, s2),
            CharMeasures.jaro(s1, s2),
            CharMeasures.needlemanWunch(s1, s2),
            CharMeasures.qGrams(bTri1.value(i), bTri2.value(j)),
            CharMeasures.longestCommonSubstring(s1, s2),
            CharMeasures.longestCommonSubsequence(s1, s2),
            TokenMeasures.cosine(t1, t2),
            TokenMeasures.block(t1, t2),
            TokenMeasures.euclidean(t1, t2),
            TokenMeasures.dice(t1, t2),
            TokenMeasures.simonWhite(t1, t2),
            TokenMeasures.overlap(t1, t2),
            TokenMeasures.jaccard(t1, t2),
            TokenMeasures.generalizedJaccard(t1, t2),
            TokenMeasures.mongeElkan(t1, t2),
          )
        }
      }
      for ((name, edges) <- sbSynMeasures.zip(perMeasure)) {
        f(
          GraphMeta(ds.spec.id, SBSyn, s"$attr:$name"),
          SimGraph.fromEdges(raw1.length, raw2.length, edges),
        )
      }
      bRaw1.destroy(); bRaw2.destroy(); bBag1.destroy(); bBag2.destroy()
      bTri1.destroy(); bTri2.destroy()
    }
  }

  // ------------------------------------------------------------------
  // Schema-agnostic syntactic: 6 vector measures + 4 graph measures
  // per n-gram model
  // ------------------------------------------------------------------

  val saVecMeasures: IndexedSeq[String] = IndexedSeq(
    "arcs", "cosine-tf", "cosine-tfidf", "jaccard", "gen-jaccard-tf", "gen-jaccard-tfidf")

  val saGraphMeasures: IndexedSeq[String] = IndexedSeq(
    "containment", "value", "normalized-value", "overall")

  private def models(cfg: SimConfig): Seq[(String, Int, Boolean)] =
    cfg.charNs.map(n => (s"char$n", n, true)) ++ cfg.tokenNs.map(n => (s"token$n", n, false))

  def schemaAgnosticSyntactic(spark: SparkSession, ds: CcerDataset, cfg: SimConfig)(
      f: (GraphMeta, SimGraph) => Unit
  ): Unit = {
    val sc = spark.sparkContext
    val texts1 = ds.profiles1.map(_.allText).toArray
    val texts2 = ds.profiles2.map(_.allText).toArray

    for ((modelName, n, char) <- models(cfg)) {
      // Vector models: TF and TF-IDF vectors per entity, DFs per side.
      val df1 = Bow.docFreq(texts1, n, char)
      val df2 = Bow.docFreq(texts2, n, char)
      val tf1 = texts1.map(Bow.tf(_, n, char))
      val tf2 = texts2.map(Bow.tf(_, n, char))
      val ti1 = texts1.map(Bow.tfIdf(_, n, char, df1, texts1.length))
      val ti2 = texts2.map(Bow.tfIdf(_, n, char, df2, texts2.length))
      val bTf1 = sc.broadcast(tf1); val bTf2 = sc.broadcast(tf2)
      val bTi1 = sc.broadcast(ti1); val bTi2 = sc.broadcast(ti2)
      val bDf1 = sc.broadcast(df1); val bDf2 = sc.broadcast(df2)

      val vec = pairScores(spark, texts1.length, texts2.length, 6) { (i, j) =>
        val a = bTf1.value(i); val b = bTf2.value(j)
        val ai = bTi1.value(i); val bi = bTi2.value(j)
        Array(
          BowMeasures.arcs(a, b, bDf1.value, bDf2.value),
          BowMeasures.cosine(a, b),
          BowMeasures.cosine(ai, bi),
          BowMeasures.jaccard(a, b),
          BowMeasures.generalizedJaccard(a, b),
          BowMeasures.generalizedJaccard(ai, bi),
        )
      }
      for ((name, edges) <- saVecMeasures.zip(vec))
        f(
          GraphMeta(ds.spec.id, SASyn, s"$modelName-vec:$name"),
          SimGraph.fromEdges(texts1.length, texts2.length, edges),
        )
      bTf1.destroy(); bTf2.destroy(); bTi1.destroy(); bTi2.destroy()
      bDf1.destroy(); bDf2.destroy()

      // Graph models.
      val g1 = texts1.map(NGramGraph.build(_, n, char))
      val g2 = texts2.map(NGramGraph.build(_, n, char))
      val bG1 = sc.broadcast(g1); val bG2 = sc.broadcast(g2)
      val gm = pairScores(spark, texts1.length, texts2.length, 4) { (i, j) =>
        val a = bG1.value(i); val b = bG2.value(j)
        val cos = NGramGraph.containment(a, b)
        val vs = NGramGraph.value(a, b)
        val ns = NGramGraph.normalizedValue(a, b)
        Array(cos, vs, ns, (cos + vs + ns) / 3.0)
      }
      for ((name, edges) <- saGraphMeasures.zip(gm))
        f(
          GraphMeta(ds.spec.id, SASyn, s"$modelName-graph:$name"),
          SimGraph.fromEdges(texts1.length, texts2.length, edges),
        )
      bG1.destroy(); bG2.destroy()
    }
  }

  // ------------------------------------------------------------------
  // Semantic: fastText-like and ALBERT-like embeddings, 3 measures each
  // ------------------------------------------------------------------

  val semMeasures: IndexedSeq[String] = IndexedSeq("cosine", "euclidean", "word-movers")

  private def semanticFamily(
      spark: SparkSession,
      texts1: Array[String],
      texts2: Array[String],
      emit: (String, String, Array[(Int, Int, Double)]) => Unit,
  ): Unit = {
    val sc = spark.sparkContext
    for ((embName, embed) <- Seq[(String, String => Array[Array[Double]])](
        "fasttext" -> (t => Embedding.fastTextTokens(t)),
        "albert" -> (t => Embedding.albertTokens(t)),
      )) {
      val toks1 = texts1.map(t => if (t == null) Array.empty[Array[Double]] else embed(t))
      val toks2 = texts2.map(t => if (t == null) Array.empty[Array[Double]] else embed(t))
      val pool1 = toks1.map(Embedding.pool)
      val pool2 = toks2.map(Embedding.pool)
      val bT1 = sc.broadcast(toks1); val bT2 = sc.broadcast(toks2)
      val bP1 = sc.broadcast(pool1); val bP2 = sc.broadcast(pool2)
      val res = pairScores(spark, texts1.length, texts2.length, 3) { (i, j) =>
        val ta = bT1.value(i); val tb = bT2.value(j)
        if (ta.isEmpty || tb.isEmpty) null
        else {
          val pa = bP1.value(i); val pb = bP2.value(j)
          Array(
            Embedding.cosine(pa, pb),
            Embedding.euclideanSim(pa, pb),
            Embedding.wordMoversSim(ta, tb),
          )
        }
      }
      for ((name, edges) <- semMeasures.zip(res)) emit(embName, name, edges)
      bT1.destroy(); bT2.destroy(); bP1.destroy(); bP2.destroy()
    }
  }

  def schemaBasedSemantic(spark: SparkSession, ds: CcerDataset)(
      f: (GraphMeta, SimGraph) => Unit
  ): Unit = {
    for (attr <- ds.spec.keyAttrs) {
      val t1 = ds.profiles1.map(p => ds.value(p, attr)).toArray
      val t2 = ds.profiles2.map(p => ds.value(p, attr)).toArray
      semanticFamily(spark, t1, t2, (emb, name, edges) =>
        f(
          GraphMeta(ds.spec.id, SBSem, s"$attr:$emb:$name"),
          SimGraph.fromEdges(t1.length, t2.length, edges),
        ))
    }
  }

  def schemaAgnosticSemantic(spark: SparkSession, ds: CcerDataset)(
      f: (GraphMeta, SimGraph) => Unit
  ): Unit = {
    val t1 = ds.profiles1.map(_.allText).toArray
    val t2 = ds.profiles2.map(_.allText).toArray
    semanticFamily(spark, t1, t2, (emb, name, edges) =>
      f(
        GraphMeta(ds.spec.id, SASem, s"$emb:$name"),
        SimGraph.fromEdges(t1.length, t2.length, edges),
      ))
  }
}
