package repro.core

import repro.graph.LocalGraph

/** Exact "yes-or-no" χ-simulation (Definitions 1–3): computes the *maximum*
  * χ-simulation relation R ⊆ V1 × V2 by coinductive fixpoint refinement —
  * start from the label-compatible pairs and repeatedly delete pairs that
  * violate the variant's conditions until stable. u ⇝χ v iff (u,v) survives.
  *
  * dp/bj conditions ("there exists an injective/bijective function") are
  * decided exactly with Kuhn's augmenting-path bipartite matching — the
  * greedy heuristic is only legitimate inside the *fractional* framework.
  */
object ExactSimulation {

  /** The maximum χ-simulation relation as one BitSet of v's per u. */
  def relation(g1: LocalGraph, g2: LocalGraph, variant: Variant): Array[java.util.BitSet] = {
    require(Variant.paper.contains(variant), s"exact simulation defined for s/dp/b/bj only")
    val n1 = g1.n; val n2 = g2.n
    val r = Array.fill(n1)(new java.util.BitSet(n2))
    for (u <- 0 until n1; v <- 0 until n2 if g1.labels(u) == g2.labels(v)) r(u).set(v)

    var changed = true
    while (changed) {
      changed = false
      var u = 0
      while (u < n1) {
        var v = r(u).nextSetBit(0)
        while (v >= 0) {
          if (!holds(g1, g2, r, variant, u, v)) { r(u).clear(v); changed = true }
          v = r(u).nextSetBit(v + 1)
        }
        u += 1
      }
    }
    r
  }

  /** Does u ⇝χ v ? */
  def simulates(g1: LocalGraph, g2: LocalGraph, variant: Variant, u: Int, v: Int): Boolean =
    relation(g1, g2, variant)(u).get(v)

  /** One-step condition check for pair (u,v) against the current relation. */
  private def holds(g1: LocalGraph, g2: LocalGraph, r: Array[java.util.BitSet],
                    variant: Variant, u: Int, v: Int): Boolean = {
    def inR(x: Int, y: Int): Boolean = r(x).get(y)

    def forwardCovered(s1: Array[Int], s2: Array[Int]): Boolean =
      s1.forall(x => s2.exists(y => inR(x, y)))
    def backwardCovered(s1: Array[Int], s2: Array[Int]): Boolean =
      s2.forall(y => s1.exists(x => inR(x, y)))
    def injective(s1: Array[Int], s2: Array[Int]): Boolean =
      Bipartite.maxMatching(s1, s2, inR) == s1.length
    def bijective(s1: Array[Int], s2: Array[Int]): Boolean =
      s1.length == s2.length && Bipartite.maxMatching(s1, s2, inR) == s1.length

    variant match {
      case Variant.S =>
        forwardCovered(g1.outAdj(u), g2.outAdj(v)) && forwardCovered(g1.inAdj(u), g2.inAdj(v))
      case Variant.B =>
        forwardCovered(g1.outAdj(u), g2.outAdj(v)) && forwardCovered(g1.inAdj(u), g2.inAdj(v)) &&
          backwardCovered(g1.outAdj(u), g2.outAdj(v)) && backwardCovered(g1.inAdj(u), g2.inAdj(v))
      case Variant.DP =>
        injective(g1.outAdj(u), g2.outAdj(v)) && injective(g1.inAdj(u), g2.inAdj(v))
      case Variant.BJ =>
        bijective(g1.outAdj(u), g2.outAdj(v)) && bijective(g1.inAdj(u), g2.inAdj(v))
      case other => throw new IllegalArgumentException(other.name)
    }
  }
}

/** Kuhn's augmenting-path maximum bipartite matching over an implicit
  * adjacency predicate. Small-side sizes here are node degrees, so the
  * O(V·E) worst case is cheap.
  */
object Bipartite {

  /** Size of the maximum matching between s1 and s2 where (s1(i), s2(j)) is
    * an edge iff allowed(s1(i), s2(j)).
    */
  def maxMatching(s1: Array[Int], s2: Array[Int], allowed: (Int, Int) => Boolean): Int = {
    val n = s1.length; val m = s2.length
    if (n == 0 || m == 0) return 0
    val matchOf = Array.fill(m)(-1) // s2 slot -> s1 slot
    var size = 0
    val visited = new Array[Boolean](m)

    def tryKuhn(i: Int): Boolean = {
      var j = 0
      while (j < m) {
        if (!visited(j) && allowed(s1(i), s2(j))) {
          visited(j) = true
          if (matchOf(j) < 0 || tryKuhn(matchOf(j))) { matchOf(j) = i; return true }
        }
        j += 1
      }
      false
    }

    var i = 0
    while (i < n) {
      java.util.Arrays.fill(visited, false)
      if (tryKuhn(i)) size += 1
      i += 1
    }
    size
  }
}
