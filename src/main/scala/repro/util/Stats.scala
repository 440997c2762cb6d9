package repro.util

/** Small statistics helpers shared by the sensitivity experiments. */
object Stats {

  /** Pearson's correlation coefficient of two equal-length samples. */
  def pearson(xs: Array[Double], ys: Array[Double]): Double = {
    require(xs.length == ys.length && xs.nonEmpty, "need equal nonempty samples")
    val n = xs.length
    val mx = xs.sum / n; val my = ys.sum / n
    var sxy = 0.0; var sxx = 0.0; var syy = 0.0
    var i = 0
    while (i < n) {
      val dx = xs(i) - mx; val dy = ys(i) - my
      sxy += dx * dy; sxx += dx * dx; syy += dy * dy
      i += 1
    }
    if (sxx == 0.0 || syy == 0.0) {
      if (sxx == 0.0 && syy == 0.0) 1.0 else 0.0
    } else sxy / math.sqrt(sxx * syy)
  }

  /** nDCG@k for a ranked list of graded relevances (0/1/2...), with the ideal
    * ranking taken over the *provided universe* of relevances.
    */
  def ndcgAt(k: Int, ranked: Seq[Int], universe: Seq[Int]): Double = {
    def dcg(rels: Seq[Int]): Double =
      rels.take(k).zipWithIndex.map { case (r, i) =>
        (math.pow(2, r) - 1) / (math.log(i + 2) / math.log(2))
      }.sum
    val ideal = dcg(universe.sorted(Ordering[Int].reverse))
    if (ideal == 0.0) 0.0 else dcg(ranked) / ideal
  }
}
