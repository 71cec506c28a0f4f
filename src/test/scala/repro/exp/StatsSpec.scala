package repro.exp

import repro.SparkSpec

class StatsSpec extends SparkSpec {
  import Stats._

  test("mean of known values") {
    assert(mean(Seq(1.0, 2.0, 3.0)) == 2.0)
    assert(mean(Seq.empty).isNaN)
  }

  test("stddev of known values (population)") {
    assert(math.abs(stddev(Seq(2.0, 4.0, 4.0, 4.0, 5.0, 5.0, 7.0, 9.0)) - 2.0) < 1e-12)
    assert(stddev(Seq(3.0)) == 0.0)
  }

  test("quantile interpolates") {
    val xs = Seq(1.0, 2.0, 3.0, 4.0)
    assert(quantile(xs, 0.0) == 1.0)
    assert(quantile(xs, 1.0) == 4.0)
    assert(math.abs(quantile(xs, 0.5) - 2.5) < 1e-12)
    assert(math.abs(quantile(xs, 0.25) - 1.75) < 1e-12)
  }

  test("pearson of perfectly correlated data is 1") {
    assert(math.abs(pearson(Seq(1, 2, 3).map(_.toDouble), Seq(2, 4, 6).map(_.toDouble)) - 1.0) < 1e-12)
  }

  test("pearson of anti-correlated data is -1") {
    assert(math.abs(pearson(Seq(1, 2, 3).map(_.toDouble), Seq(3, 2, 1).map(_.toDouble)) + 1.0) < 1e-12)
  }

  test("pearson is NaN for constant series") {
    assert(pearson(Seq(1.0, 1.0), Seq(2.0, 3.0)).isNaN)
  }

  test("meanRanks ranks higher values first") {
    val ranks = meanRanks(Seq(
      Map("a" -> 0.9, "b" -> 0.5, "c" -> 0.1),
      Map("a" -> 0.8, "b" -> 0.9, "c" -> 0.1),
    ))
    assert(ranks("a") == 1.5)
    assert(ranks("b") == 1.5)
    assert(ranks("c") == 3.0)
  }

  test("meanRanks averages tied ranks") {
    val ranks = meanRanks(Seq(Map("a" -> 0.5, "b" -> 0.5, "c" -> 0.1)))
    assert(ranks("a") == 1.5 && ranks("b") == 1.5 && ranks("c") == 3.0)
  }
}
