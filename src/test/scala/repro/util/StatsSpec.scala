package repro.util

import repro.{Oracle, SparkSpec}

class StatsSpec extends SparkSpec {

  test("pearson: perfect positive and negative correlation") {
    val xs = Array(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(Stats.pearson(xs, xs.map(_ * 2 + 1)) - 1.0) < 1e-12)
    assert(math.abs(Stats.pearson(xs, xs.map(-_)) + 1.0) < 1e-12)
  }

  test("pearson: uncorrelated alternation") {
    val xs = Array(1.0, 2.0, 3.0, 4.0)
    val ys = Array(1.0, -1.0, 1.0, -1.0)
    assert(math.abs(Stats.pearson(xs, ys)) < 0.5)
  }

  test("pearson: constant series convention") {
    assert(Stats.pearson(Array(1.0, 1.0), Array(1.0, 1.0)) === 1.0)
    assert(Stats.pearson(Array(1.0, 1.0), Array(1.0, 2.0)) === 0.0)
  }

  test("pearson matches DuckDB corr() (oracle)") {
    import spark.implicits._
    val rnd = new scala.util.Random(7)
    val xs = Array.fill(200)(rnd.nextDouble())
    val ys = xs.map(x => 0.7 * x + 0.3 * rnd.nextDouble())
    val df = xs.zip(ys).toSeq.toDF("x", "y")
    val sparkCorr = df.selectExpr("round(corr(x, y), 6) as c")
    Oracle.assertEquivalent(sparkCorr,
      "SELECT round(corr(CAST(x AS DOUBLE), CAST(y AS DOUBLE)), 6) AS c FROM t",
      "t" -> df)
    val ours = Stats.pearson(xs, ys)
    assert(math.abs(ours - sparkCorr.first().getDouble(0)) < 1e-5)
  }

  test("ndcg: ideal ranking scores 1") {
    assert(Stats.ndcgAt(5, Seq(2, 2, 1, 0, 0), Seq(2, 2, 1, 0, 0)) === 1.0)
  }

  test("ndcg: reversed ranking scores below 1") {
    val v = Stats.ndcgAt(5, Seq(0, 0, 1, 2, 2), Seq(2, 2, 1, 0, 0))
    assert(v > 0.0 && v < 1.0)
  }

  test("ndcg: known hand-computed value") {
    // ranked (2,0,1), universe (2,1,0): dcg = 3/1 + 0 + 1/2 = 3.5
    // idcg = 3/1 + 1/1.585 + 0 = 3.6309...
    val v = Stats.ndcgAt(3, Seq(2, 0, 1), Seq(2, 1, 0))
    val idcg = 3.0 + 1.0 / (math.log(3) / math.log(2))
    assert(math.abs(v - 3.5 / idcg) < 1e-9)
  }

  test("ndcg: all-zero universe scores 0") {
    assert(Stats.ndcgAt(3, Seq(0, 0), Seq(0, 0)) === 0.0)
  }
}
