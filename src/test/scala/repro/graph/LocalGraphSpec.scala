package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.TestGraphs

class LocalGraphSpec extends AnyFunSuite {

  private val g = LocalGraph.fromEdges(
    Array("a", "b", "c", "a"),
    Seq((0, 1), (1, 2), (2, 3), (0, 1))) // duplicate edge deduplicated

  test("fromEdges deduplicates and builds both adjacencies") {
    assert(g.m === 3)
    assert(g.outAdj(0).toSeq === Seq(1))
    assert(g.inAdj(1).toSeq === Seq(0))
    assert(g.outDeg(1) === 1 && g.inDeg(1) === 1)
  }

  test("degree and label statistics") {
    assert(g.n === 4)
    assert(g.labelSet === Set("a", "b", "c"))
    assert(g.maxOutDeg === 1)
    assert(g.maxInDeg === 1)
    assert(math.abs(g.avgDeg - 0.75) < 1e-12)
  }

  test("hasEdge") {
    assert(g.hasEdge(0, 1) && !g.hasEdge(1, 0) && !g.hasEdge(0, 3))
  }

  test("undirected neighbors") {
    assert(g.undirectedNeighbors(1).toSeq === Seq(0, 2))
  }

  test("ball radius 1 and 2") {
    assert(g.ball(1, 1).toSeq === Seq(0, 1, 2))
    assert(g.ball(1, 2).toSeq === Seq(0, 1, 2, 3))
  }

  test("inducedSubgraph keeps internal edges and remaps ids") {
    val (sub, ids) = g.inducedSubgraph(Array(1, 2, 3))
    assert(ids.toSeq === Seq(1, 2, 3))
    assert(sub.n === 3)
    assert(sub.edges.toSeq === Seq((0, 1), (1, 2))) // 1->2, 2->3 remapped
    assert(sub.labels.toSeq === Seq("b", "c", "a"))
  }

  test("diameter of a path graph") {
    val p = LocalGraph.fromEdges(Array.fill(5)("x"), (0 until 4).map(i => (i, i + 1)))
    assert(p.diameter === 4)
  }

  test("disjoint union shifts ids") {
    val u = g.disjointUnion(g)
    assert(u.n === 8)
    assert(u.m === 6)
    assert(u.hasEdge(4, 5))
    assert(u.labels(4) === "a")
  }

  for (seed <- 1 to 5) {
    test(s"sampleConnectedSubgraph returns a connected subgraph of requested size, seed $seed") {
      val big = TestGraphs.uniform(60, 180, 3, seed)
      val rnd = new Random(seed)
      val (q, ids) = big.sampleConnectedSubgraph(6, rnd)
      assert(q.n === 6)
      assert(ids.length === 6)
      assert(q.diameter < 6, "connected (finite eccentricities)")
      // labels preserved from the original
      for (i <- 0 until q.n) assert(q.labels(i) === big.labels(ids(i)))
      // every query edge exists in the original
      for ((a, b) <- q.edges) assert(big.hasEdge(ids(a), ids(b)))
    }
  }

  for (seed <- 1 to 5) {
    test(s"withAddedEdges adds exactly k new edges, seed $seed") {
      val base = TestGraphs.uniform(20, 40, 2, seed)
      val noisy = base.withAddedEdges(5, new Random(seed))
      assert(noisy.m === base.m + 5)
      assert(noisy.labels.toSeq === base.labels.toSeq)
    }
    test(s"withRemovedEdges removes exactly k edges, seed $seed") {
      val base = TestGraphs.uniform(20, 40, 2, seed)
      val noisy = base.withRemovedEdges(5, new Random(seed))
      assert(noisy.m === base.m - 5)
    }
    test(s"withPerturbedLabels changes exactly k labels, seed $seed") {
      val base = TestGraphs.uniform(20, 40, 4, seed)
      val sigma = base.labelSet.toIndexedSeq
      val noisy = base.withPerturbedLabels(5, sigma, new Random(seed))
      val changed = (0 until base.n).count(i => base.labels(i) != noisy.labels(i))
      assert(changed === 5)
      assert(noisy.m === base.m)
    }
  }

  test("empty graph edge cases") {
    val e = LocalGraph.fromEdges(Array.empty[String], Seq.empty)
    assert(e.n === 0 && e.m === 0 && e.maxOutDeg === 0 && e.avgDeg === 0.0)
  }
}
