package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.graph.GraphFrames

/** The Spark engine must agree with the local reference engine bit-for-bit
  * (shared mapping operators, deterministic tie-breaking).
  */
class FSimSparkSpec extends SparkSpec {

  private def assertEnginesAgree(cfg: FSimConfig, seed: Int, n1: Int = 9, n2: Int = 10): Unit = {
    val g1 = TestGraphs.uniform(n1, 2 * n1, 2, seed)
    val g2 = TestGraphs.uniform(n2, 2 * n2, 2, seed + 77)
    val local = FSimLocal.compute(g1, g2, cfg)
    val dist = FSimSpark.compute(spark, g1, g2, cfg)
    val distScores = dist.collectScores()
    assert(distScores.size === local.numPairs, "candidate-pair sets differ")
    for (((u, v), s) <- distScores)
      assert(math.abs(s - local.score(u.toInt, v.toInt)) < 1e-9,
        s"pair ($u,$v): spark=$s local=${local.score(u.toInt, v.toInt)}")
    assert(dist.iterations === local.iterations,
      s"iterations: spark=${dist.iterations} local=${local.iterations}")
  }

  // exactIters pins both engines to the same fixed number of sweeps — an
  // equally strong equivalence check without ~40 convergence rounds per test.
  for (variant <- Variant.paper; seed <- Seq(1, 2)) {
    test(s"spark == local, χ=${variant.name}, θ=0, seed $seed") {
      assertEnginesAgree(
        FSimConfig(variant, 0.4, 0.4, theta = 0.0, exactIters = Some(5)), seed)
    }
  }

  for (variant <- Variant.paper) {
    test(s"spark == local, χ=${variant.name}, θ=1 (label-constrained)") {
      assertEnginesAgree(
        FSimConfig(variant, 0.4, 0.4, theta = 1.0, exactIters = Some(5)), 5)
    }
  }

  test("spark == local at full ε-convergence (χ=bj)") {
    assertEnginesAgree(FSimConfig(Variant.BJ, 0.4, 0.4, theta = 0.0, epsilon = 0.01), 3)
  }

  test("spark == local with Jaro-Winkler labels and θ=0.5") {
    val cfg = FSimConfig(Variant.S, 0.3, 0.5, labelSim = LabelSim.JaroWinkler,
      theta = 0.5, exactIters = Some(5))
    val g1 = TestGraphs.random(12, 24, 5, 31)
    val g2 = TestGraphs.random(12, 24, 5, 32)
    val local = FSimLocal.compute(g1, g2, cfg)
    val dist = FSimSpark.compute(spark, g1, g2, cfg).collectScores()
    assert(dist.size === local.numPairs)
    for (((u, v), s) <- dist)
      assert(math.abs(s - local.score(u.toInt, v.toInt)) < 1e-9)
  }

  test("spark == local with asymmetric weights (w+=0.7, w-=0.1)") {
    assertEnginesAgree(FSimConfig(Variant.DP, 0.7, 0.1, exactIters = Some(5)), 8)
  }

  test("spark engine on the paper's Figure 1 reproduces the Table 2 check matrix") {
    import repro.exp.Table2._
    for (variant <- Variant.paper) {
      val cfg = FSimConfig(variant, 0.4, 0.4, theta = 0.0, exactIters = Some(12))
      val scores = FSimSpark.compute(spark, g1, g2, cfg).collectScores()
      for ((vName, vId) <- vs) {
        val expected = paper((variant.name, vName))._1
        val s = scores((u.toLong, vId.toLong))
        assert((s >= 1.0 - 1e-6) === expected, s"χ=${variant.name} (u,$vName): $s")
      }
    }
  }

  test("empty candidate set returns an empty result") {
    val g1 = repro.graph.LocalGraph.fromEdges(Array("a"), Seq.empty)
    val g2 = repro.graph.LocalGraph.fromEdges(Array("b"), Seq.empty)
    val res = FSimSpark.compute(spark, g1, g2, FSimConfig(Variant.S, 0.4, 0.4, theta = 1.0))
    assert(res.scores.count() === 0L)
  }

  test("candidate pairs under θ=1 equal the same-label cross product (oracle)") {
    val g1 = TestGraphs.uniform(12, 20, 3, 41)
    val g2 = TestGraphs.uniform(13, 22, 3, 42)
    val n1 = GraphFrames.nodesDF(spark, g1)
    val n2 = GraphFrames.nodesDF(spark, g2)
    val candCount = n1.as("a").crossJoin(n2.as("b"))
      .filter(org.apache.spark.sql.functions.expr("a.label = b.label"))
      .selectExpr("count(*) as cnt")
    repro.Oracle.assertEquivalent(candCount,
      "SELECT count(*) AS cnt FROM n1, n2 WHERE n1.label = n2.label",
      "n1" -> n1, "n2" -> n2)
    val res = FSimSpark.compute(spark, g1, g2, FSimConfig(Variant.S, 0.4, 0.4, theta = 1.0))
    assert(res.scores.count() === candCount.first().getLong(0))
  }
}
