package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.graph.GraphFrames

class KBisimulationSpec extends SparkSpec {

  test("k=0 classes are label classes") {
    val g = TestGraphs.uniform(12, 20, 3, 1)
    val cls = KBisimulation.classes(g, 0)
    for (u <- 0 until g.n; v <- 0 until g.n)
      assert((cls(u) == cls(v)) === (g.labels(u) == g.labels(v)))
  }

  for (seed <- 1 to 4; k <- Seq(1, 2, 3)) {
    test(s"classes refine monotonically: $k-bisimilar ⟹ ${k - 1}-bisimilar, seed $seed") {
      val g = TestGraphs.uniform(14, 28, 2, seed)
      val prev = KBisimulation.classes(g, k - 1)
      val cur = KBisimulation.classes(g, k)
      for (u <- 0 until g.n; v <- 0 until g.n if cur(u) == cur(v))
        assert(prev(u) === prev(v), s"($u,$v)")
    }
  }

  for (seed <- 1 to 4; k <- Seq(1, 2, 3)) {
    test(s"Theorem 4: FSim_b^k(u,v)=1 ⇔ u,v $k-bisimilar, seed $seed") {
      val g = TestGraphs.uniform(10, 20, 2, seed + 30)
      val cls = KBisimulation.classes(g, k)
      // single graph, out-neighbors only (w- -> 0), exactly k iterations
      val res = FSimLocal.compute(g, g,
        FSimConfig(Variant.B, wPlus = 0.8, wMinus = 1e-12, theta = 0.0,
          exactIters = Some(k)))
      for (u <- 0 until g.n; v <- 0 until g.n) {
        val isOne = res.score(u, v) >= 1.0 - 1e-9
        assert(isOne === (cls(u) == cls(v)),
          s"k=$k ($u,$v): score=${res.score(u, v)} clsEq=${cls(u) == cls(v)}")
      }
    }
  }

  for (seed <- 1 to 3; k <- Seq(2, 4)) {
    test(s"spark signatures induce the same partition as local classes, k=$k, seed $seed") {
      val g = TestGraphs.uniform(16, 32, 3, seed + 60)
      val cls = KBisimulation.classes(g, k)
      val sigs = KBisimulation.signaturesSpark(spark,
          GraphFrames.nodesDF(spark, g), GraphFrames.edgesDF(spark, g), k)
        .collect().map(r => r.getLong(0).toInt -> r.getLong(1)).toMap
      for (u <- 0 until g.n; v <- 0 until g.n)
        assert((sigs(u) == sigs(v)) === (cls(u) == cls(v)), s"($u,$v)")
    }
  }

  test("full bisimulation classes are a fixpoint") {
    val g = TestGraphs.uniform(14, 30, 2, 91)
    val cls = KBisimulation.fullClasses(g)
    // one more refinement round must not split any class
    for (u <- 0 until g.n; v <- 0 until g.n if cls(u) == cls(v)) {
      assert(g.outAdj(u).map(cls).toSet === g.outAdj(v).map(cls).toSet, s"out ($u,$v)")
      assert(g.inAdj(u).map(cls).toSet === g.inAdj(v).map(cls).toSet, s"in ($u,$v)")
    }
  }

  test("out-only full classes (Olap substrate) are coarser or equal") {
    val g = TestGraphs.uniform(14, 30, 2, 92)
    val full = KBisimulation.fullClasses(g, useIn = true)
    val outOnly = KBisimulation.fullClasses(g, useIn = false)
    for (u <- 0 until g.n; v <- 0 until g.n if full(u) == full(v))
      assert(outOnly(u) === outOnly(v), s"($u,$v)")
  }
}
