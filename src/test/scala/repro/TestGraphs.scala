package repro

import repro.graph.{GraphGen, LocalGraph}
import scala.util.Random

/** Small deterministic random graphs for unit tests. */
object TestGraphs {

  /** Random labeled digraph with n nodes, ~m edges, k labels. */
  def random(n: Int, m: Int, k: Int, seed: Long): LocalGraph =
    GraphGen.generate(GraphGen.Config(s"t$seed", n, m, k, skew = 0.3), seed)

  /** Random digraph with uniform edges (no skew) — denser small cases. */
  def uniform(n: Int, m: Int, k: Int, seed: Long): LocalGraph = {
    val rnd = new Random(seed)
    val sigma = (0 until k).map(i => s"l$i")
    val labels = Array.fill(n)(sigma(rnd.nextInt(k)))
    val edges = Seq.fill(m)((rnd.nextInt(n), rnd.nextInt(n))).filter(e => e._1 != e._2)
    LocalGraph.fromEdges(labels, edges)
  }
}
