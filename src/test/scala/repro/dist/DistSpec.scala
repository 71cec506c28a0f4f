package repro.dist

import org.scalacheck.Gen
import repro.{PropSupport, SparkSpec}
import repro.core.{Matchers, SimGraph}

/** Equivalence of the distributed matchers with their sequential
  * counterparts, plus DuckDB-oracle checks of the SQL-expressible ones.
  */
class DistSpec extends SparkSpec with PropSupport {

  // Iterative DataFrame algorithms on tiny graphs are dominated by
  // shuffle scheduling; fewer partitions keep this suite fast.
  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions", "8")
  }

  override def afterAll(): Unit = {
    spark.conf.set("spark.sql.shuffle.partitions",
      sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
    super.afterAll()
  }

  private val genGraph: Gen[SimGraph] = for {
    n1 <- Gen.choose(2, 8)
    n2 <- Gen.choose(2, 8)
    m <- Gen.choose(1, n1 * n2)
    pairs <- Gen.pick(m, for { i <- 0 until n1; j <- 0 until n2 } yield (i, j))
  } yield {
    val edges = pairs.zipWithIndex.map { case ((i, j), k) =>
      (i, j, 0.05 + 0.9 * ((((i * 131 + j * 31 + k) * 2654435761L) & 0xfffff).toDouble / 1048576.0))
    }
    SimGraph.fromEdges(n1, n2, edges.toSeq)
  }

  test("DistExc equals core EXC on random graphs") {
    forAllSamples(genGraph, n = 8) { g =>
      val edges = DistGraph.fromSimGraph(spark, g)
      for (t <- Seq(0.1, 0.5)) {
        val dist = DistGraph.collectPairs(DistExc.run(edges, t))
        assert(dist == Matchers.exc.run(g, t).pairSet, s"t=$t")
      }
    }
  }

  test("DistUmc equals core UMC on random graphs (distinct weights)") {
    forAllSamples(genGraph, n = 6) { g =>
      val edges = DistGraph.fromSimGraph(spark, g)
      val dist = DistGraph.collectPairs(DistUmc.run(spark, edges, 0.1))
      assert(dist == Matchers.umc.run(g, 0.1).pairSet)
    }
  }

  test("DistCnc equals core CNC on random graphs") {
    forAllSamples(genGraph, n = 6) { g =>
      val edges = DistGraph.fromSimGraph(spark, g)
      val dist = DistGraph.collectPairs(DistCnc.run(spark, edges, 0.4, g.n1))
      assert(dist == Matchers.cnc.run(g, 0.4).pairSet)
    }
  }

  test("DistExc on the Figure 1 example") {
    val g = SimGraph.fromEdges(5, 4,
      Seq((0, 0, 0.6), (4, 0, 0.9), (4, 2, 0.6), (1, 1, 0.8), (2, 3, 0.7)))
    val dist = DistGraph.collectPairs(DistExc.run(DistGraph.fromSimGraph(spark, g), 0.5))
    assert(dist == Set((4, 0), (1, 1), (2, 3)))
  }

  test("minMaxNormalize matches SimGraph.minMaxNormalized") {
    val g = SimGraph.fromEdges(2, 3, Seq((0, 0, 0.2), (0, 1, 0.6), (1, 2, 1.0)))
    val normed = DistGraph.minMaxNormalize(DistGraph.fromSimGraph(spark, g))
      .collect().map(r => (r.getInt(0), r.getInt(1), r.getDouble(2))).toSet
    val expected = {
      val n = g.minMaxNormalized
      n.src.indices.map(e => (n.src(e), n.dst(e), n.w(e))).toSet
    }
    assert(normed == expected)
  }

  test("minMaxNormalize maps constant weights to 1.0") {
    val g = SimGraph.fromEdges(1, 2, Seq((0, 0, 0.4), (0, 1, 0.4)))
    val ws = DistGraph.minMaxNormalize(DistGraph.fromSimGraph(spark, g))
      .collect().map(_.getDouble(2)).toSet
    assert(ws == Set(1.0))
  }

  test("prune strict vs inclusive") {
    val g = SimGraph.fromEdges(1, 2, Seq((0, 0, 0.5), (0, 1, 0.6)))
    val df = DistGraph.fromSimGraph(spark, g)
    assert(DistGraph.prune(df, 0.5, strict = true).count() == 1)
    assert(DistGraph.prune(df, 0.5, strict = false).count() == 2)
  }

  test("DistExc agrees with the DuckDB window-function oracle") {
    val g = SimGraph.fromEdges(4, 4,
      Seq((0, 0, 0.9), (0, 1, 0.8), (1, 0, 0.7), (1, 1, 0.95), (2, 2, 0.6), (3, 2, 0.61)))
    val edges = DistGraph.fromSimGraph(spark, g)
    val result = DistExc.run(edges, 0.5).selectExpr("cast(src as int) as src", "cast(dst as int) as dst")
    repro.Oracle.assertEquivalent(
      result,
      """WITH ranked AS (
        |  SELECT CAST(src AS INT) src, CAST(dst AS INT) dst,
        |    row_number() OVER (PARTITION BY src
        |      ORDER BY CAST(w AS DOUBLE) DESC, CAST(src AS INT) ASC, CAST(dst AS INT) ASC) rs,
        |    row_number() OVER (PARTITION BY dst
        |      ORDER BY CAST(w AS DOUBLE) DESC, CAST(src AS INT) ASC, CAST(dst AS INT) ASC) rd
        |  FROM edges WHERE CAST(w AS DOUBLE) > 0.5)
        |SELECT src, dst FROM ranked WHERE rs = 1 AND rd = 1""".stripMargin,
      "edges" -> edges,
    )
  }

  test("DistCnc agrees with the DuckDB recursive-CTE oracle") {
    val n1 = 3
    val g = SimGraph.fromEdges(n1, 3,
      Seq((0, 0, 0.9), (1, 0, 0.8), (1, 1, 0.7), (2, 2, 0.85)))
    val edges = DistGraph.fromSimGraph(spark, g)
    val result = DistCnc.run(spark, edges, 0.5, n1)
      .selectExpr("cast(src as int) as src", "cast(dst as int) as dst")
    repro.Oracle.assertEquivalent(
      result,
      s"""WITH RECURSIVE
         |  und AS (
         |    SELECT CAST(src AS INT) a, CAST(dst AS INT) + $n1 b FROM edges WHERE CAST(w AS DOUBLE) >= 0.5
         |    UNION ALL
         |    SELECT CAST(dst AS INT) + $n1, CAST(src AS INT) FROM edges WHERE CAST(w AS DOUBLE) >= 0.5),
         |  reach(n, m) AS (
         |    SELECT a, a FROM (SELECT a FROM und UNION SELECT b FROM und) nodes
         |    UNION
         |    SELECT reach.n, und.b FROM reach JOIN und ON reach.m = und.a),
         |  labels AS (SELECT n, MIN(m) lbl FROM reach GROUP BY n),
         |  comps AS (SELECT lbl, COUNT(*) sz, MIN(n) lo, MAX(n) hi FROM labels GROUP BY lbl)
         |SELECT lo AS src, hi - $n1 AS dst FROM comps WHERE sz = 2 AND lo < $n1 AND hi >= $n1""".stripMargin,
      "edges" -> edges,
    )
  }
}
