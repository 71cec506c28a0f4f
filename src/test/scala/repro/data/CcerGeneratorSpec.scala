package repro.data

import repro.SparkSpec
import repro.sim.{TokenBag, TokenMeasures}

class CcerGeneratorSpec extends SparkSpec {

  private lazy val d1 = CcerGenerator.generate(DatasetSpec.byId("D1"), scale = 0.2)

  test("specs cover D1..D10 with the paper's category taxonomy") {
    assert(DatasetSpec.all.map(_.id) == (1 to 10).map(i => s"D$i"))
    assert(DatasetSpec.all.filter(_.category == Balanced).map(_.id) == Seq("D2", "D4", "D10"))
    assert(DatasetSpec.all.filter(_.category == OneSided).map(_.id) == Seq("D3", "D9"))
    assert(DatasetSpec.all.filter(_.category == Scarce).map(_.id).toSet ==
      Set("D1", "D5", "D6", "D7", "D8"))
  }

  test("duplicate portions justify the categories") {
    for (spec <- DatasetSpec.all) {
      val r1 = spec.dups.toDouble / spec.n1
      val r2 = spec.dups.toDouble / spec.n2
      spec.category match {
        case Balanced => assert(r1 >= 0.7 && r2 >= 0.7, s"${spec.id} not balanced")
        case OneSided => assert(math.max(r1, r2) >= 0.7 && math.min(r1, r2) < 0.5, spec.id)
        case Scarce   => assert(r1 < 0.5 && r2 < 0.5, s"${spec.id} not scarce")
      }
    }
  }

  test("generated sizes match the scaled spec") {
    assert(d1.profiles1.length == DatasetSpec.scaled(DatasetSpec.byId("D1"), 0.2).n1)
    assert(d1.profiles2.length == DatasetSpec.scaled(DatasetSpec.byId("D1"), 0.2).n2)
  }

  test("ground truth size equals the scaled duplicate count and ids are valid") {
    val spec = DatasetSpec.scaled(DatasetSpec.byId("D1"), 0.2)
    assert(d1.groundTruth.size == spec.dups)
    assert(d1.groundTruth.forall { case (i, j) =>
      i >= 0 && i < spec.n1 && j >= 0 && j < spec.n2
    })
    assert(d1.groundTruth.map(_._1).distinct.size == spec.dups)
    assert(d1.groundTruth.map(_._2).distinct.size == spec.dups)
  }

  test("generation is deterministic") {
    val again = CcerGenerator.generate(DatasetSpec.byId("D1"), scale = 0.2)
    assert(again.profiles1 == d1.profiles1)
    assert(again.profiles2 == d1.profiles2)
    assert(again.groundTruth == d1.groundTruth)
  }

  test("different datasets differ") {
    val d2 = CcerGenerator.generate(DatasetSpec.byId("D2"), scale = 0.1)
    assert(d2.profiles1.head.values != d1.profiles1.head.values)
  }

  test("duplicates are textually more similar than random pairs") {
    val sims = d1.groundTruth.take(30).map { case (i, j) =>
      TokenMeasures.jaccard(
        TokenBag.of(d1.profiles1(i).allText), TokenBag.of(d1.profiles2(j).allText))
    }
    val rand = d1.groundTruth.take(30).map { case (i, j) =>
      TokenMeasures.jaccard(
        TokenBag.of(d1.profiles1(i).allText),
        TokenBag.of(d1.profiles2((j + 7) % d1.profiles2.length).allText))
    }
    assert(sims.sum / sims.size > rand.sum / rand.size + 0.2)
  }

  test("missing-value rates are honoured approximately") {
    val d10 = CcerGenerator.generate(DatasetSpec.byId("D10"))
    val spec = DatasetSpec.byId("D10")
    val attrIdx = spec.attrs.indexWhere(_.name == "year")
    val missRate = d10.profiles2.count(_.values(attrIdx) == null).toDouble / d10.profiles2.length
    assert(math.abs(missRate - spec.attrs(attrIdx).missRate2) < 0.1)
  }

  test("key attributes exist in every spec") {
    for (spec <- DatasetSpec.all; k <- spec.keyAttrs)
      assert(spec.attrs.exists(_.name == k), s"${spec.id} missing key attr $k")
  }

  test("nvp and avgPairs are consistent") {
    assert(d1.nvp(1) == d1.profiles1.map(_.values.count(_ != null)).sum)
    assert(math.abs(d1.avgPairs(1) - d1.nvp(1).toDouble / d1.profiles1.length) < 1e-12)
    assert(d1.avgPairs(1) <= d1.spec.attrs.length)
  }

  test("scaled spec clamps duplicates to the smaller side") {
    val s = DatasetSpec.scaled(DatasetSpec.byId("D2"), 0.01)
    assert(s.dups <= math.min(s.n1, s.n2))
    assert(s.n1 >= 2)
  }

  test("misplacement moves a value into the first word attribute") {
    val d4 = CcerGenerator.generate(DatasetSpec.byId("D4"), scale = 0.5)
    val spec = d4.spec
    val titleIdx = spec.attrs.indexWhere(_.name == "title")
    val authorsIdx = spec.attrs.indexWhere(_.name == "authors")
    // Some profiles must have a null authors value folded into the title
    // (title unusually long + authors missing).
    val misplaced = (d4.profiles1 ++ d4.profiles2).count { p =>
      p.values(authorsIdx) == null && p.values(titleIdx) != null &&
        p.values(titleIdx).split(' ').length > 10
    }
    assert(misplaced > 0)
  }

  test("Spark DataFrames round-trip the profiles") {
    val df1 = d1.toDF(spark, 1)
    assert(df1.count() == d1.profiles1.length)
    assert(df1.columns.toSeq == "id" +: d1.spec.attrs.map(_.name))
    val gtDf = d1.gtDF(spark)
    assert(gtDf.count() == d1.groundTruth.size)
  }

  test("DataFrame row counts agree with the DuckDB oracle") {
    val df = d1.toDF(spark, 1).selectExpr("count(*) as cnt")
    repro.Oracle.assertEquivalent(df, "SELECT count(*) AS cnt FROM v1", "v1" -> d1.toDF(spark, 1))
  }
}
