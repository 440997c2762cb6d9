package repro.graph

import scala.collection.mutable
import scala.util.Random

/** Compact in-memory node-labeled directed graph (the paper's data model,
  * Section 2): nodes are 0..n-1, each with a string label; edges are directed.
  *
  * This is the substrate every exact algorithm (exact χ-simulation, strong
  * simulation, the pattern-matching/alignment baselines) runs on, and the
  * canonical form the Spark engine converts from/to via [[GraphFrames]].
  *
  * Adjacency is CSR-like: `outAdj(u)` / `inAdj(u)` are sorted arrays.
  */
final class LocalGraph(
    val labels: Array[String],
    val outAdj: Array[Array[Int]],
    val inAdj: Array[Array[Int]]
) extends Serializable {

  /** Number of nodes. */
  def n: Int = labels.length

  /** Number of directed edges. */
  lazy val m: Long = outAdj.iterator.map(_.length.toLong).sum

  def outDeg(u: Int): Int = outAdj(u).length
  def inDeg(u: Int): Int  = inAdj(u).length

  /** Distinct labels of the graph (Σ). */
  lazy val labelSet: Set[String] = labels.toSet

  /** Maximum out-degree D⁺ (0 for the empty graph). */
  def maxOutDeg: Int = if (n == 0) 0 else (0 until n).map(outDeg).max

  /** Maximum in-degree D⁻ (0 for the empty graph). */
  def maxInDeg: Int = if (n == 0) 0 else (0 until n).map(inDeg).max

  /** Average (total) degree m/n rounded as in the paper's Table 4. */
  def avgDeg: Double = if (n == 0) 0.0 else m.toDouble / n

  /** All edges as (src, dst) pairs. */
  def edges: Iterator[(Int, Int)] =
    (0 until n).iterator.flatMap(u => outAdj(u).iterator.map(v => (u, v)))

  def hasEdge(u: Int, v: Int): Boolean =
    java.util.Arrays.binarySearch(outAdj(u), v) >= 0

  /** Undirected neighbors (used by RoleSim / WL-test adaptations, §4.3). */
  def undirectedNeighbors(u: Int): Array[Int] =
    (outAdj(u) ++ inAdj(u)).distinct.sorted

  /** Nodes within (shortest-path, undirected) distance `radius` of `center` —
    * the ball used by strong simulation (Ma et al.), G[v, δ_Q].
    */
  def ball(center: Int, radius: Int): Array[Int] = {
    val dist  = mutable.HashMap[Int, Int](center -> 0)
    val queue = mutable.Queue(center)
    while (queue.nonEmpty) {
      val u = queue.dequeue()
      val d = dist(u)
      if (d < radius) {
        var i = 0
        val nbrs = undirectedNeighbors(u)
        while (i < nbrs.length) {
          val w = nbrs(i)
          if (!dist.contains(w)) { dist(w) = d + 1; queue += w }
          i += 1
        }
      }
    }
    dist.keys.toArray.sorted
  }

  /** Induced subgraph on `nodes`; returns the subgraph and the mapping from
    * new node id to original node id.
    */
  def inducedSubgraph(nodes: Array[Int]): (LocalGraph, Array[Int]) = {
    val sorted = nodes.distinct.sorted
    val index  = sorted.zipWithIndex.toMap
    val lbl    = sorted.map(labels)
    val out    = sorted.map(u => outAdj(u).collect { case v if index.contains(v) => index(v) }.sorted)
    val in     = sorted.map(u => inAdj(u).collect { case v if index.contains(v) => index(v) }.sorted)
    (new LocalGraph(lbl, out, in), sorted)
  }

  /** Undirected diameter of this (assumed small, connected) graph — used as
    * δ_Q by strong simulation. For disconnected graphs returns the maximum
    * eccentricity within components.
    */
  def diameter: Int = {
    var best = 0
    for (s <- 0 until n) {
      val dist = Array.fill(n)(-1)
      dist(s) = 0
      val q = mutable.Queue(s)
      while (q.nonEmpty) {
        val u = q.dequeue()
        for (w <- undirectedNeighbors(u) if dist(w) < 0) { dist(w) = dist(u) + 1; q += w }
      }
      val ecc = dist.max
      if (ecc > best) best = ecc
    }
    best
  }

  /** Extract a connected query subgraph of about `size` nodes by undirected
    * BFS from a random start. Returns (query, origIds) where origIds(q) is the
    * ground-truth match of query node q. Used by the Table-6 workload.
    */
  def sampleConnectedSubgraph(size: Int, rnd: Random): (LocalGraph, Array[Int]) = {
    var attempt = 0
    while (attempt < 64) {
      val start   = rnd.nextInt(n)
      val chosen  = mutable.LinkedHashSet(start)
      val frontier = mutable.ArrayBuffer(start)
      while (chosen.size < size && frontier.nonEmpty) {
        val u = frontier.remove(rnd.nextInt(frontier.length))
        val nbrs = rnd.shuffle(undirectedNeighbors(u).toSeq)
        for (w <- nbrs if chosen.size < size && !chosen.contains(w)) {
          chosen += w; frontier += w
        }
      }
      if (chosen.size == size) return inducedSubgraph(chosen.toArray)
      attempt += 1
    }
    // Fall back to whatever component we can reach.
    val start = rnd.nextInt(n)
    inducedSubgraph(ball(start, size))
  }

  /** Copy with `k` random edges added (structural noise, §5.2 / Table 6). */
  def withAddedEdges(k: Int, rnd: Random): LocalGraph = {
    val existing = mutable.HashSet[Long]()
    for ((u, v) <- edges) existing += (u.toLong << 32) | v.toLong
    val extra = mutable.ArrayBuffer[(Int, Int)]()
    var tries = 0
    while (extra.size < k && tries < 100 * (k + 1)) {
      val u = rnd.nextInt(n); val v = rnd.nextInt(n)
      val key = (u.toLong << 32) | v.toLong
      if (u != v && !existing.contains(key)) { existing += key; extra += ((u, v)) }
      tries += 1
    }
    LocalGraph.fromEdges(labels, edges.toSeq ++ extra)
  }

  /** Copy with `k` random edges removed. */
  def withRemovedEdges(k: Int, rnd: Random): LocalGraph = {
    val all = edges.toArray
    val keep = rnd.shuffle(all.indices.toList).drop(math.min(k, all.length)).map(all(_))
    LocalGraph.fromEdges(labels, keep)
  }

  /** Copy with `k` random node labels replaced by another label drawn from the
    * alphabet `sigma` (label noise, Table 6's Noisy-L).
    */
  def withPerturbedLabels(k: Int, sigma: IndexedSeq[String], rnd: Random): LocalGraph = {
    val lbl = labels.clone()
    val victims = rnd.shuffle((0 until n).toList).take(math.min(k, n))
    for (u <- victims) {
      var nl = sigma(rnd.nextInt(sigma.length))
      var guard = 0
      while (nl == lbl(u) && guard < 16) { nl = sigma(rnd.nextInt(sigma.length)); guard += 1 }
      lbl(u) = nl
    }
    new LocalGraph(lbl, outAdj, inAdj)
  }

  /** Disjoint union with `other` (other's ids shifted by `n`). */
  def disjointUnion(other: LocalGraph): LocalGraph = {
    val lbl = labels ++ other.labels
    val out = outAdj.map(identity) ++ other.outAdj.map(_.map(_ + n))
    val in  = inAdj.map(identity) ++ other.inAdj.map(_.map(_ + n))
    new LocalGraph(lbl, out, in)
  }
}

object LocalGraph {

  /** Build from a label array and an edge list (duplicates/self-loops kept as
    * given, but deduplicated — the paper's graphs are simple digraphs).
    */
  def fromEdges(labels: Array[String], edges: Seq[(Int, Int)]): LocalGraph = {
    val n = labels.length
    val dedup = edges.distinct.filter { case (u, v) => u >= 0 && u < n && v >= 0 && v < n }
    val out = Array.fill(n)(mutable.ArrayBuffer[Int]())
    val in  = Array.fill(n)(mutable.ArrayBuffer[Int]())
    for ((u, v) <- dedup) { out(u) += v; in(v) += u }
    new LocalGraph(labels, out.map(_.toArray.sorted), in.map(_.toArray.sorted))
  }
}
