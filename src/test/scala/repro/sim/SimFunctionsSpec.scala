package repro.sim

import repro.SparkSpec
import repro.core.SimGraph
import repro.data.{CcerGenerator, DatasetSpec}

class SimFunctionsSpec extends SparkSpec {

  private lazy val ds = CcerGenerator.generate(DatasetSpec.byId("D1"), scale = 0.12)
  private val tinyCfg = SimConfig(charNs = Seq(3), tokenNs = Seq(1))

  private def collectGraphs(cfg: SimConfig): Seq[(GraphMeta, SimGraph)] = {
    val buf = scala.collection.mutable.ArrayBuffer[(GraphMeta, SimGraph)]()
    SimFunctions.forEachGraph(spark, ds, cfg)((m, g) => buf += ((m, g)))
    buf.toSeq
  }

  test("functionCount matches the paper's taxonomy arithmetic") {
    // Full config, 1 key attribute: 16 + (6 models * 10) + 6 + 6 = 88.
    assert(SimFunctions.functionCount(1) == 88)
    // 2 key attributes: 32 + 60 + 12 + 6 = 110.
    assert(SimFunctions.functionCount(2) == 110)
    // Paper's schema-agnostic syntactic count per dataset is 60.
    assert(SimFunctions.functionCount(0, SimConfig(families = Set(SASyn))) == 60)
  }

  test("forEachGraph enumerates the expected graphs for a reduced config") {
    val graphs = collectGraphs(tinyCfg)
    // D1 has 2 key attrs: 2*16 SBSyn + 2 models*10 SASyn + 2*6 SBSem + 6 SASem.
    assert(graphs.size == 32 + 20 + 12 + 6)
    assert(graphs.map(_._1.function).distinct.size == graphs.size)
  }

  test("graph metas carry the dataset id and weight types") {
    val graphs = collectGraphs(SimConfig(charNs = Seq(3), tokenNs = Seq(),
      families = Set(SASyn)))
    assert(graphs.nonEmpty)
    assert(graphs.forall(_._1.dataset == "D1"))
    assert(graphs.forall(_._1.weightType == SASyn))
    assert(graphs.map(_._1.function).exists(_.startsWith("char3-vec:")))
    assert(graphs.map(_._1.function).exists(_.startsWith("char3-graph:")))
  }

  test("edge weights are positive and node ids in range") {
    for ((meta, g) <- collectGraphs(SimConfig(charNs = Seq(), tokenNs = Seq(1),
        families = Set(SASyn))).take(6)) {
      assert(g.w.forall(_ > 0.0), meta.function)
      assert(g.src.forall(i => i >= 0 && i < ds.profiles1.length))
      assert(g.dst.forall(j => j >= 0 && j < ds.profiles2.length))
    }
  }

  test("schema-based graphs skip pairs with missing attribute values") {
    val graphs = collectGraphs(SimConfig(families = Set(SBSyn)))
    val addrIdx = ds.spec.attrs.indexWhere(_.name == "name")
    assert(addrIdx >= 0)
    // Every edge of a name-based graph connects profiles with names.
    val nameGraphs = graphs.filter(_._1.function.startsWith("name:"))
    assert(nameGraphs.nonEmpty)
    for ((_, g) <- nameGraphs.take(3); e <- 0 until math.min(g.m, 50)) {
      assert(ds.profiles1(g.src(e)).values(addrIdx) != null)
      assert(ds.profiles2(g.dst(e)).values(addrIdx) != null)
    }
  }

  test("duplicate pairs score above the graph median for an exact-ish measure") {
    val graphs = collectGraphs(SimConfig(charNs = Seq(), tokenNs = Seq(1),
      families = Set(SASyn)))
    val (_, g) = graphs.find(_._1.function == "token1-vec:cosine-tf").get
    val wOf = g.src.indices.map(e => (g.src(e), g.dst(e)) -> g.w(e)).toMap
    val dupW = ds.groundTruth.flatMap(wOf.get)
    assert(dupW.nonEmpty)
    val median = g.w(g.m / 2)
    assert(dupW.sum / dupW.size > median)
  }

  test("semantic graphs are denser than syntactic ones (bias property)") {
    val sem = collectGraphs(SimConfig(families = Set(SASem)))
    val syn = collectGraphs(SimConfig(charNs = Seq(), tokenNs = Seq(1), families = Set(SASyn)))
    val semCos = sem.find(_._1.function == "fasttext:cosine").get._2
    val synCos = syn.find(_._1.function == "token1-vec:cosine-tf").get._2
    assert(semCos.m > synCos.m)
    // Semantic cosine covers (nearly) the full Cartesian product.
    val cart = ds.profiles1.length.toLong * ds.profiles2.length
    assert(semCos.m > 0.9 * cart)
  }

  test("pairScores drops all-nonpositive rows and splits measures") {
    val sc = spark
    val res = SimFunctions.pairScores(sc, 2, 2, 2) { (i, j) =>
      if (i == 0 && j == 0) Array(1.0, 0.0)
      else if (i == 1 && j == 1) Array(0.0, 0.5)
      else Array(0.0, 0.0)
    }
    assert(res(0).toSeq == Seq((0, 0, 1.0)))
    assert(res(1).toSeq == Seq((1, 1, 0.5)))
  }

  test("pairScores honours null kernel results") {
    val res = SimFunctions.pairScores(spark, 2, 2, 1) { (i, j) =>
      if (i == j) null else Array(0.7)
    }
    assert(res(0).map(e => (e._1, e._2)).toSet == Set((0, 1), (1, 0)))
  }

  test("token-unigram TF cosine agrees with the DuckDB relational oracle") {
    import org.apache.spark.sql.functions._
    // Small text corpus; cosine over raw counts equals cosine over TF.
    val texts1 = Seq((0, "alpha beta beta"), (1, "gamma delta"), (2, "zulu"))
    val texts2 = Seq((0, "alpha beta"), (1, "delta gamma gamma"), (2, "omega"))
    val b1 = texts1.map { case (i, t) => i -> Bow.tf(t, 1, char = false) }
    val b2 = texts2.map { case (j, t) => j -> Bow.tf(t, 1, char = false) }
    val edges = for {
      (i, va) <- b1; (j, vb) <- b2
      s = BowMeasures.cosine(va, vb) if s > 0
    } yield (i, j, BigDecimal(s).setScale(6, BigDecimal.RoundingMode.HALF_UP).toDouble)

    val sparkDf = spark.createDataFrame(edges).toDF("id1", "id2", "sim")
    def tokDf(texts: Seq[(Int, String)]) = {
      val rows = texts.flatMap { case (i, t) =>
        Tokenize.tokens(t).groupBy(identity).map { case (tok, g) => (i, tok, g.length) }
      }
      spark.createDataFrame(rows).toDF("id", "tok", "cnt")
    }
    repro.Oracle.assertEquivalent(
      sparkDf.select(col("id1").cast("int"), col("id2").cast("int"), col("sim")),
      """WITH
        |  n1 AS (SELECT id, SQRT(SUM(CAST(cnt AS DOUBLE)*CAST(cnt AS DOUBLE))) nrm FROM tok1 GROUP BY id),
        |  n2 AS (SELECT id, SQRT(SUM(CAST(cnt AS DOUBLE)*CAST(cnt AS DOUBLE))) nrm FROM tok2 GROUP BY id),
        |  dots AS (
        |    SELECT CAST(t1.id AS INT) id1, CAST(t2.id AS INT) id2,
        |           SUM(CAST(t1.cnt AS DOUBLE)*CAST(t2.cnt AS DOUBLE)) d
        |    FROM tok1 t1 JOIN tok2 t2 ON t1.tok = t2.tok
        |    GROUP BY t1.id, t2.id)
        |SELECT id1, id2, ROUND(d / (a.nrm * b.nrm), 6) sim
        |FROM dots JOIN n1 a ON dots.id1 = CAST(a.id AS INT)
        |          JOIN n2 b ON dots.id2 = CAST(b.id AS INT)
        |WHERE d > 0""".stripMargin,
      "tok1" -> tokDf(texts1),
      "tok2" -> tokDf(texts2),
    )
  }
}
