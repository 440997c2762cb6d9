package repro.core

import repro.graph.LocalGraph

/** Direct reference implementations of SimRank (Jeh & Widom 2002) and
  * RoleSim (Jin et al. 2011), used to validate the paper's §4.3 claim that
  * the FSimχ framework can be *configured* to compute both (tests compare
  * these against FSimLocal with the corresponding configurations).
  */
object SimRankRoleSim {

  /** SimRank with decay c on a single digraph: s(u,u)=1 and
    * s_k(u,v) = c/(|I(u)||I(v)|) Σ_{u'∈I(u),v'∈I(v)} s_{k-1}(u',v'),
    * 0 when either in-neighborhood is empty.
    */
  def simRank(g: LocalGraph, c: Double = 0.8, iters: Int = 10): Array[Array[Double]] = {
    val n = g.n
    var prev = Array.tabulate(n, n)((u, v) => if (u == v) 1.0 else 0.0)
    for (_ <- 1 to iters) {
      val next = Array.tabulate(n, n) { (u, v) =>
        if (u == v) 1.0
        else {
          val iu = g.inAdj(u); val iv = g.inAdj(v)
          if (iu.isEmpty || iv.isEmpty) 0.0
          else {
            var s = 0.0
            for (x <- iu; y <- iv) s += prev(x)(y)
            c * s / (iu.length.toDouble * iv.length)
          }
        }
      }
      prev = next
    }
    prev
  }

  /** The FSimχ configuration of SimRank (§4.3): w⁺=0, w⁻=c, M=S1×S2,
    * Ω=|S1||S2|, L≡0, init = identity, diagonal pinned.
    */
  def simRankConfig(c: Double = 0.8, iters: Int = 10): FSimConfig = FSimConfig(
    variant = Variant.SimRankCfg,
    wPlus = 1e-12, // framework requires w+ + w- > 0 and each < 1; out side is ~0
    wMinus = c,
    exactIters = Some(iters),
    pinDiagonal = true,
    initOverride = Some((u, v) => if (u == v) 1.0 else 0.0),
    labelTermOverride = Some((_, _) => 0.0)
  )

  /** RoleSim with decay β on the *undirected* view of g:
    * r_k(u,v) = (1-β)·maxMatch(r_{k-1})/max(d(u),d(v)) + β, greedy matching.
    * Initialization min(d)/max(d) as in the original paper.
    */
  def roleSim(g: LocalGraph, beta: Double = 0.2, iters: Int = 10): Array[Array[Double]] = {
    val n = g.n
    val adj = Array.tabulate(n)(g.undirectedNeighbors)
    def d(u: Int) = adj(u).length
    var prev = Array.tabulate(n, n) { (u, v) =>
      if (math.max(d(u), d(v)) == 0) 1.0 else math.min(d(u), d(v)).toDouble / math.max(d(u), d(v))
    }
    for (_ <- 1 to iters) {
      val next = Array.tabulate(n, n) { (u, v) =>
        if (d(u) == 0 && d(v) == 0) (1 - beta) * 1.0 + beta
        else if (d(u) == 0 || d(v) == 0) beta
        else {
          val cands = for (x <- adj(u).toSeq; y <- adj(v).toSeq)
            yield Matching.Cand(x, y, prev(x)(y))
          (1 - beta) * Matching.mapRaw(Variant.RoleSimCfg, cands) / math.max(d(u), d(v)) + beta
        }
      }
      prev = next
    }
    prev
  }

  /** The FSimχ configuration of RoleSim (§4.3): undirected neighbors as
    * out-neighbors (use [[undirectedView]]), w⁻→0, L≡1, greedy matching with
    * Ω = max degree, init min(d)/max(d).
    */
  def roleSimConfig(g: LocalGraph, beta: Double = 0.2, iters: Int = 10): FSimConfig = {
    def d(u: Int) = g.undirectedNeighbors(u).length
    FSimConfig(
      variant = Variant.RoleSimCfg,
      wPlus = 1 - beta,
      wMinus = 1e-12,
      exactIters = Some(iters),
      initOverride = Some { (u, v) =>
        if (math.max(d(u), d(v)) == 0) 1.0
        else math.min(d(u), d(v)).toDouble / math.max(d(u), d(v))
      },
      labelTermOverride = Some((_, _) => 1.0)
    )
  }

  /** Replace adjacency with the undirected closure as out-edges (in-edges
    * empty) — the graph model adaptation §4.3 uses for RoleSim and the WL
    * test. All labels are collapsed (label-free model).
    */
  def undirectedView(g: LocalGraph): LocalGraph = {
    val edges = (0 until g.n).flatMap(u => g.undirectedNeighbors(u).map(v => (u, v)))
    LocalGraph.fromEdges(Array.fill(g.n)("_"), edges)
  }
}
