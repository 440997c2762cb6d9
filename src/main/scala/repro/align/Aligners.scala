package repro.align

import repro.core._
import repro.graph.LocalGraph
import scala.collection.mutable
import scala.util.Random

/** A graph aligner: map each node u of g1 to its candidate set A_u in g2
  * (singleton for one-to-one aligners, possibly larger for class-based ones,
  * empty when the aligner abstains).
  */
trait Aligner {
  def name: String
  def align(g1: LocalGraph, g2: LocalGraph): Map[Int, Seq[Int]]
}

object Aligner {

  /** Paper's Table-9 F1: per u, P_u = 1/|A_u| and R_u = 1 if the ground truth
    * is in A_u (else 0), averaged as Σ_u 2 P_u R_u / (|V1| (P_u + R_u)).
    * Ground truth here is the identity (shared node ids across versions).
    */
  def f1Identity(g1: LocalGraph, result: Map[Int, Seq[Int]]): Double = {
    var sum = 0.0
    for (u <- 0 until g1.n) {
      val au = result.getOrElse(u, Seq.empty)
      if (au.contains(u) && au.nonEmpty) {
        val p = 1.0 / au.size
        sum += 2 * p / (p + 1)
      }
    }
    sum / g1.n
  }
}

/** FSimχ aligner (the paper's §5.4 rule): A_u = argmax_v FSimχ(u, v),
  * with θ=1 and indicator labels as in the case studies.
  */
final class FSimAligner(variant: Variant,
                        precomputed: Option[FSimResult] = None) extends Aligner {
  val name = s"FSim_${variant.name}"
  def align(g1: LocalGraph, g2: LocalGraph): Map[Int, Seq[Int]] = {
    val res = precomputed.getOrElse(
      FSimLocal.compute(g1, g2,
        FSimConfig(variant, wPlus = 0.4, wMinus = 0.4, theta = 1.0, epsilon = 1e-3)))
    res.argmaxByU().map { case (u, (_, vs)) => u -> vs }
  }
}

/** k-bisimulation aligner: A_u = {v : sig_k(u) == sig_k(v)} with signatures
  * computed over the disjoint union (so classes are comparable across the
  * two graphs), per [21]/[10].
  */
final class KBisimAligner(k: Int) extends Aligner {
  val name = s"$k-bisim"
  def align(g1: LocalGraph, g2: LocalGraph): Map[Int, Seq[Int]] = {
    val union = g1.disjointUnion(g2)
    val cls = KBisimulation.classes(union, k)
    val byClass2 = (0 until g2.n).groupBy(v => cls(g1.n + v))
    (0 until g1.n).map(u => u -> byClass2.getOrElse(cls(u), Seq.empty).toSeq).toMap
  }
}

/** Olap-like aligner (Buneman & Staworko, PVLDB'16): align within the blocks
  * of a one-round *dual* (out+in) label-signature partition — a local
  * bisimulation approximation. The converged partition is uselessly fine on
  * churned versions (every split propagates globally), so like Olap's
  * edge-label-driven blocks we stop at depth-1 neighborhood structure.
  * Simplified reimplementation of the unavailable original (DESIGN.md §3).
  */
final class OlapAligner extends Aligner {
  val name = "Olap"
  def align(g1: LocalGraph, g2: LocalGraph): Map[Int, Seq[Int]] = {
    def sig(g: LocalGraph)(u: Int): (String, Seq[String], Seq[String]) =
      (g.labels(u), g.outAdj(u).map(g.labels).toSeq.sorted, g.inAdj(u).map(g.labels).toSeq.sorted)
    val byClass2 = (0 until g2.n).groupBy(sig(g2))
    (0 until g1.n).map(u => u -> byClass2.getOrElse(sig(g1)(u), Seq.empty).toSeq).toMap
  }
}

/** GSANA-like aligner (Yasar & Çatalyürek, KDD'18): anchor a few high-degree
  * pairs by (label, degree) signature, give every node its vector of BFS
  * distances to the anchors, and align nearest same-label vectors one-to-one.
  * Simplified reimplementation (DESIGN.md §3).
  */
final class GsanaAligner(numAnchors: Int = 8) extends Aligner {
  val name = "GSANA"

  private def bfsDist(g: LocalGraph, src: Int): Array[Int] = {
    val dist = Array.fill(g.n)(Int.MaxValue)
    dist(src) = 0
    val q = mutable.Queue(src)
    while (q.nonEmpty) {
      val u = q.dequeue()
      for (w <- g.undirectedNeighbors(u) if dist(w) == Int.MaxValue) {
        dist(w) = dist(u) + 1; q += w
      }
    }
    dist
  }

  def align(g1: LocalGraph, g2: LocalGraph): Map[Int, Seq[Int]] = {
    // anchors: top-degree g1 nodes matched to the same-label g2 node of
    // closest total degree
    val top1 = (0 until g1.n).sortBy(u => -(g1.outDeg(u) + g1.inDeg(u))).take(numAnchors)
    val usedAnchors = mutable.HashSet[Int]()
    val anchorPairs = top1.flatMap { u =>
      val cands = (0 until g2.n).filter(v =>
        g2.labels(v) == g1.labels(u) && !usedAnchors.contains(v))
      if (cands.isEmpty) None
      else {
        val v = cands.minBy(v => math.abs((g2.outDeg(v) + g2.inDeg(v)) - (g1.outDeg(u) + g1.inDeg(u))))
        usedAnchors += v
        Some((u, v))
      }
    }
    if (anchorPairs.isEmpty) return Map.empty
    val d1 = anchorPairs.map(p => bfsDist(g1, p._1)).toArray
    val d2 = anchorPairs.map(p => bfsDist(g2, p._2)).toArray

    def vec(ds: Array[Array[Int]], u: Int): Array[Int] =
      ds.map(d => if (d(u) == Int.MaxValue) 99 else math.min(d(u), 99))

    val byLabel2 = (0 until g2.n).groupBy(g2.labels(_))
    val used = mutable.HashSet[Int]()
    // greedy one-to-one: most distinctive (rarest-label) first
    val order = (0 until g1.n).sortBy(u => byLabel2.getOrElse(g1.labels(u), Seq.empty).size)
    order.flatMap { u =>
      val vu = vec(d1, u)
      val cands = byLabel2.getOrElse(g1.labels(u), Seq.empty).filterNot(used.contains)
      if (cands.isEmpty) None
      else {
        val v = cands.minBy(v => vec(d2, v).zip(vu).map { case (a, b) => math.abs(a - b) }.sum)
        used += v
        Some(u -> Seq(v))
      }
    }.toMap
  }
}

/** FINAL-like aligner (Zhang & Tong, KDD'16): attributed network alignment by
  * an iterative Sylvester-style update restricted to same-label pairs,
  * s ← (1−α)·h + α·⟨neighborhood mean of s⟩, then greedy one-to-one
  * extraction. Simplified reimplementation (DESIGN.md §3).
  */
final class FinalAligner(alpha: Double = 0.8, iters: Int = 8) extends Aligner {
  val name = "FINAL"
  def align(g1: LocalGraph, g2: LocalGraph): Map[Int, Seq[Int]] = {
    val n2 = g2.n
    val byLabel2 = (0 until n2).groupBy(g2.labels(_))
    // candidate pairs: same label
    val keys = (0 until g1.n).flatMap(u =>
      byLabel2.getOrElse(g1.labels(u), Seq.empty).map(v => u.toLong * n2 + v)).toArray
    java.util.Arrays.sort(keys)
    val index = new mutable.LongMap[Int](keys.length * 2)
    keys.zipWithIndex.foreach { case (k, i) => index(k) = i }
    var prev = Array.fill(keys.length)(1.0)
    var next = new Array[Double](keys.length)
    val und1 = Array.tabulate(g1.n)(g1.undirectedNeighbors)
    val und2 = Array.tabulate(g2.n)(g2.undirectedNeighbors)

    def get(scores: Array[Double], x: Int, y: Int): Double =
      index.get(x.toLong * n2 + y).map(scores).getOrElse(0.0)

    for (_ <- 1 to iters) {
      java.util.stream.IntStream.range(0, keys.length).parallel().forEach { i =>
        val u = (keys(i) / n2).toInt; val v = (keys(i) % n2).toInt
        val nu = und1(u); val nv = und2(v)
        val structural =
          if (nu.isEmpty || nv.isEmpty) 0.0
          else {
            // FINAL's symmetrically normalized product-graph propagation:
            // weight of (x,y) -> (u,v) is 1/sqrt(d(u)d(v)d(x)d(y)).
            var s = 0.0
            for (x <- nu; y <- nv) {
              val dxy = und1(x).length.toDouble * und2(y).length
              if (dxy > 0) s += get(prev, x, y) / math.sqrt(dxy)
            }
            s / math.sqrt(nu.length.toDouble * nv.length)
          }
        next(i) = (1 - alpha) * 1.0 + alpha * structural
      }
      val t = prev; prev = next; next = t
    }

    // greedy one-to-one extraction by score desc
    val order = keys.indices.sortBy(i => -prev(i))
    val usedU = mutable.HashSet[Int](); val usedV = mutable.HashSet[Int]()
    val out = mutable.HashMap[Int, Seq[Int]]()
    for (i <- order) {
      val u = (keys(i) / n2).toInt; val v = (keys(i) % n2).toInt
      if (!usedU.contains(u) && !usedV.contains(v)) {
        usedU += u; usedV += v; out(u) = Seq(v)
      }
    }
    out.toMap
  }
}

/** EWS-like aligner ("ExpandWhenStuck" percolation matching, Kazemi et al.,
  * PVLDB'15): grow a one-to-one matching from a handful of seed pairs by
  * spreading marks to label-consistent neighbor pairs and matching pairs
  * that reach r marks; when stuck, promote the best single-marked pair.
  * Needs seeds by design — we hand it `numSeeds` noisy ground-truth pairs,
  * as the original protocol does (DESIGN.md §3). With the original's r=2,
  * pairs need two independently matched neighbor pairs — degree-1 nodes
  * (RDF attribute leaves) can never accumulate two marks, which is the
  * structural weakness that keeps percolation matching below the
  * fractional-simulation aligners; `maxPromotions` bounds the
  * expand-when-stuck step.
  */
final class EwsAligner(numSeeds: Int = 40, r: Int = 2, seed: Long = 5L,
                       wrongSeedFrac: Double = 0.2, maxPromotions: Int = 80) extends Aligner {
  val name = "EWS"
  def align(g1: LocalGraph, g2: LocalGraph): Map[Int, Seq[Int]] = {
    val rnd = new Random(seed)
    val common = math.min(g1.n, g2.n)
    // seeds are noisy, as in the original's problem setting: a fraction maps
    // to a wrong same-label node
    val byLabel2 = (0 until g2.n).groupBy(g2.labels(_))
    val seeds = rnd.shuffle((0 until common).toList).take(numSeeds).map { u =>
      if (rnd.nextDouble() < wrongSeedFrac) {
        val cands = byLabel2.getOrElse(g1.labels(u), Seq(u)).filterNot(_ == u)
        (u, if (cands.isEmpty) u else cands(rnd.nextInt(cands.size)))
      } else (u, u)
    }
    val marks = new mutable.LongMap[Int]()
    val matchedU = mutable.HashMap[Int, Int]()
    val matchedV = mutable.HashSet[Int]()
    val queue = mutable.Queue[(Int, Int)]()

    def spread(u: Int, v: Int): Unit = {
      def mark(x: Int, y: Int): Unit = {
        if (!matchedU.contains(x) && !matchedV.contains(y) && g1.labels(x) == g2.labels(y)) {
          val key = x.toLong * g2.n + y
          val c = marks.getOrElse(key, 0) + 1
          marks(key) = c
          if (c >= r) { matchedU(x) = y; matchedV += y; queue += ((x, y)) }
        }
      }
      for (x <- g1.outAdj(u); y <- g2.outAdj(v)) mark(x, y)
      for (x <- g1.inAdj(u); y <- g2.inAdj(v)) mark(x, y)
    }

    for ((u, v) <- seeds if !matchedU.contains(u) && !matchedV.contains(v)) {
      matchedU(u) = v; matchedV += v; queue += ((u, v))
    }
    // Percolate; when stuck (queue empty) promote the best single-marked pair
    // — the "expand when stuck" step of the original algorithm. Stop when no
    // marked unmatched pairs remain.
    var stuck = false
    var promotions = 0
    while (!stuck) {
      while (queue.nonEmpty) {
        val (u, v) = queue.dequeue()
        spread(u, v)
      }
      if (promotions >= maxPromotions) stuck = true
      else {
        val best = marks.iterator
          .map { case (key, c) => ((key / g2.n).toInt, (key % g2.n).toInt, c) }
          .filter { case (x, y, _) => !matchedU.contains(x) && !matchedV.contains(y) }
          .reduceOption { (a, b) =>
            // most marks first; tie-break by closest total degree
            def degDiff(t: (Int, Int, Int)) =
              math.abs((g1.outDeg(t._1) + g1.inDeg(t._1)) - (g2.outDeg(t._2) + g2.inDeg(t._2)))
            if (a._3 > b._3 || (a._3 == b._3 && degDiff(a) <= degDiff(b))) a else b
          }
        best match {
          case Some((x, y, _)) =>
            matchedU(x) = y; matchedV += y; queue += ((x, y)); promotions += 1
          case None => stuck = true
        }
      }
    }
    matchedU.map { case (u, v) => u -> Seq(v) }.toMap
  }
}
