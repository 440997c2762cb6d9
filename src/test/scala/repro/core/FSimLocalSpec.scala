package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.graph.LocalGraph

/** Executable versions of the paper's Definition 4 (P1–P3), Theorem 1 /
  * Corollary 1, and the §3.4 optimizations, on the local reference engine.
  */
class FSimLocalSpec extends AnyFunSuite {

  private val OneTol = 1e-6

  private def cfg(v: Variant) =
    FSimConfig(v, wPlus = 0.4, wMinus = 0.4, theta = 0.0, epsilon = 1e-8)

  for (seed <- 1 to 6; variant <- Variant.paper) {
    test(s"P1 range: all scores within [0,1], χ=${variant.name}, seed $seed") {
      val g1 = TestGraphs.uniform(9, 16, 2, seed)
      val g2 = TestGraphs.uniform(10, 18, 2, seed + 50)
      val res = FSimLocal.compute(g1, g2, cfg(variant))
      res.pairs.foreach { case (u, v, s) =>
        assert(s >= -1e-12 && s <= 1.0 + 1e-9, s"($u,$v)=$s")
      }
    }
  }

  for (seed <- 1 to 6; variant <- Variant.paper) {
    test(s"P2 simulation definiteness: score=1 ⇔ exact χ-simulation, χ=${variant.name}, seed $seed") {
      val g1 = TestGraphs.uniform(8, 14, 2, seed)
      val g2 = TestGraphs.uniform(9, 16, 2, seed + 50)
      val exact = ExactSimulation.relation(g1, g2, variant)
      val res = FSimLocal.compute(g1, g2, cfg(variant))
      for (u <- 0 until g1.n; v <- 0 until g2.n) {
        val isOne = res.score(u, v) >= 1.0 - OneTol
        assert(isOne === exact(u).get(v),
          s"χ=${variant.name} ($u,$v): score=${res.score(u, v)} exact=${exact(u).get(v)}")
      }
    }
  }

  for (seed <- 1 to 6; variant <- Seq(Variant.B, Variant.BJ)) {
    test(s"P3 χ-conditional symmetry, χ=${variant.name}, seed $seed") {
      val g = TestGraphs.uniform(10, 20, 2, seed)
      val res = FSimLocal.compute(g, g, cfg(variant))
      for (u <- 0 until g.n; v <- 0 until g.n)
        assert(math.abs(res.score(u, v) - res.score(v, u)) < 1e-9, s"($u,$v)")
    }
  }

  for (variant <- Variant.paper) {
    test(s"Corollary 1: converges within ⌈log_(w+ + w-) ε⌉ iterations, χ=${variant.name}") {
      val g1 = TestGraphs.uniform(12, 25, 3, 7)
      val g2 = TestGraphs.uniform(12, 25, 3, 8)
      val c = FSimConfig(variant, wPlus = 0.4, wMinus = 0.4, epsilon = 0.01)
      val res = FSimLocal.compute(g1, g2, c)
      assert(res.iterations <= c.iterationBound + 1)
      assert(res.finalDelta < c.epsilon)
    }
  }

  test("iteration bound formula") {
    val c = FSimConfig(Variant.S, wPlus = 0.4, wMinus = 0.4, epsilon = 0.01)
    assert(c.iterationBound === math.ceil(math.log(0.01) / math.log(0.8)).toInt)
  }

  test("original Milner semantics: w- = 0 ignores in-neighbors") {
    // u with an extra in-neighbor is still fully simulated when w- = 0
    val g1 = LocalGraph.fromEdges(Array("a", "p"), Seq((1, 0)))
    val g2 = LocalGraph.fromEdges(Array("a", "p"), Seq.empty)
    val res = FSimLocal.compute(g1, g2,
      FSimConfig(Variant.S, wPlus = 0.8, wMinus = 1e-12, epsilon = 1e-8))
    assert(res.score(0, 0) >= 1.0 - 1e-9)
  }

  test("label term dominates when w* is large") {
    val g1 = TestGraphs.uniform(8, 12, 2, 3)
    val g2 = TestGraphs.uniform(8, 12, 2, 4)
    val res = FSimLocal.compute(g1, g2,
      FSimConfig(Variant.S, wPlus = 0.05, wMinus = 0.05, epsilon = 1e-8))
    for ((u, v, s) <- res.pairs) {
      val lbl = if (g1.labels(u) == g2.labels(v)) 1.0 else 0.0
      assert(math.abs(s - lbl) <= 0.1 + 1e-9, s"($u,$v)=$s lbl=$lbl")
    }
  }

  test("θ=1 maintains only same-label pairs (Remark 2 pruning)") {
    val g1 = TestGraphs.uniform(10, 20, 3, 5)
    val g2 = TestGraphs.uniform(10, 20, 3, 6)
    val res = FSimLocal.compute(g1, g2, cfg(Variant.S).copy(theta = 1.0))
    val sameLabel = (for (u <- 0 until g1.n; v <- 0 until g2.n
                          if g1.labels(u) == g2.labels(v)) yield (u, v)).toSet
    assert(res.numPairs === sameLabel.size)
    res.pairs.foreach { case (u, v, _) => assert(sameLabel((u, v))) }
  }

  test("θ=1 scores equal θ=0 scores on same-label-only mappings graph") {
    // single-label graph: θ has no effect
    val g = TestGraphs.uniform(10, 22, 1, 9)
    val r0 = FSimLocal.compute(g, g, cfg(Variant.BJ))
    val r1 = FSimLocal.compute(g, g, cfg(Variant.BJ).copy(theta = 1.0))
    for (u <- 0 until g.n; v <- 0 until g.n)
      assert(math.abs(r0.score(u, v) - r1.score(u, v)) < 1e-12)
  }

  for (variant <- Variant.paper) {
    test(s"P2 on the paper's Figure 1, χ=${variant.name}") {
      import repro.exp.Table2._
      val res = FSimLocal.compute(g1, g2, cfg(variant))
      for ((vName, vId) <- vs) {
        val expected = paper((variant.name, vName))._1
        assert((res.score(u, vId) >= 1.0 - OneTol) === expected, s"(u,$vName)")
      }
    }
  }

  test("Figure 1 fractional ordering: v4 ≥ v3 ≥ ... with v1 strictly worst (bj)") {
    import repro.exp.Table2._
    val res = FSimLocal.compute(g1, g2, cfg(Variant.BJ))
    val scores = vs.map { case (_, vId) => res.score(u, vId) }
    assert(scores(3) === scores.max)
    assert(scores(0) === scores.min)
    assert(scores(0) < 1.0 - OneTol)
  }

  // ---- upper-bound updating (§3.4) ----

  test("ub with β=0 prunes nothing and equals the baseline") {
    val g1 = TestGraphs.uniform(9, 18, 2, 11)
    val g2 = TestGraphs.uniform(9, 18, 2, 12)
    val base = FSimLocal.compute(g1, g2, cfg(Variant.BJ))
    val ub = FSimLocal.compute(g1, g2,
      cfg(Variant.BJ).copy(ub = Some(UbConfig(alpha = 0.2, beta = 0.0))))
    assert(base.numPairs === ub.numPairs)
    for ((u, v, s) <- base.pairs) assert(math.abs(s - ub.score(u, v)) < 1e-12)
  }

  test("ub prunes pairs and keeps survivors' scores close (α=0, β=0.5)") {
    val g1 = TestGraphs.uniform(12, 24, 3, 13)
    val g2 = TestGraphs.uniform(12, 24, 3, 14)
    val base = FSimLocal.compute(g1, g2, cfg(Variant.BJ))
    val ub = FSimLocal.compute(g1, g2,
      cfg(Variant.BJ).copy(ub = Some(UbConfig(alpha = 0.0, beta = 0.5))))
    assert(ub.numPairs < base.numPairs)
    // survivors stay within the pruning-induced error envelope
    var maxErr = 0.0
    for ((u, v, s) <- ub.pairs) maxErr = math.max(maxErr, math.abs(s - base.score(u, v)))
    assert(maxErr < 0.5, s"maxErr=$maxErr")
  }

  test("upper bound dominates the true score (Eq. 6)") {
    val g1 = TestGraphs.uniform(10, 20, 2, 15)
    val g2 = TestGraphs.uniform(10, 20, 2, 16)
    val c = cfg(Variant.DP)
    val base = FSimLocal.compute(g1, g2, c)
    val sigma1 = g1.labels.distinct; val sigma2 = g2.labels.distinct
    val id1 = sigma1.zipWithIndex.toMap; val id2 = sigma2.zipWithIndex.toMap
    val l1 = g1.labels.map(id1); val l2 = g2.labels.map(id2)
    val lsim = Array.tabulate(sigma1.length, sigma2.length)((a, b) =>
      c.labelSim(sigma1(a), sigma2(b)))
    for ((u, v, s) <- base.pairs) {
      val bound = FSimLocal.upperBound(g1, g2, c, u, v, l1, l2, lsim)
      assert(s <= bound + 1e-9, s"($u,$v): $s > $bound")
    }
  }

  test("result lookup: unmaintained pairs score 0") {
    val g1 = LocalGraph.fromEdges(Array("a"), Seq.empty)
    val g2 = LocalGraph.fromEdges(Array("b"), Seq.empty)
    val res = FSimLocal.compute(g1, g2, cfg(Variant.S).copy(theta = 1.0))
    assert(res.numPairs === 0)
    assert(res.score(0, 0) === 0.0)
  }
}
