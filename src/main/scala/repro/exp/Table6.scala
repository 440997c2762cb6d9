package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.Variant
import repro.graph.{GraphGen, LocalGraph}
import repro.matching._
import scala.util.Random

/** Table 6: average pattern-matching F1 over four query scenarios on the
  * Amazon-like graph. Queries of 3–13 nodes are extracted from the data
  * graph (ground truth = extraction mapping) and noised with up to 33%
  * inserted edges (Noisy-E) and/or up to 33% relabeled nodes (Noisy-L),
  * exactly the paper's protocol (§5.4).
  */
object Table6 {

  val scenarios: Seq[String] = Seq("Exact", "Noisy-E", "Noisy-L", "Combined")

  /** Paper's Table 6 (avg F1 %, '-' reported as None). */
  val paper: Map[(String, String), Option[Double]] = Map(
    ("Exact", "NAGA") -> Some(30.2), ("Exact", "G-Finder") -> Some(100.0),
    ("Exact", "TSpan-1") -> Some(100.0), ("Exact", "TSpan-3") -> Some(100.0),
    ("Exact", "StrongSim") -> Some(100.0), ("Exact", "FSim_s") -> Some(100.0),
    ("Exact", "FSim_dp") -> Some(100.0),
    ("Noisy-E", "NAGA") -> Some(30.5), ("Noisy-E", "G-Finder") -> Some(49.2),
    ("Noisy-E", "TSpan-1") -> Some(71.0), ("Noisy-E", "TSpan-3") -> Some(95.8),
    ("Noisy-E", "StrongSim") -> Some(50.0), ("Noisy-E", "FSim_s") -> Some(84.0),
    ("Noisy-E", "FSim_dp") -> Some(65.7),
    ("Noisy-L", "NAGA") -> Some(20.6), ("Noisy-L", "G-Finder") -> Some(40.7),
    ("Noisy-L", "TSpan-1") -> None, ("Noisy-L", "TSpan-3") -> None,
    ("Noisy-L", "StrongSim") -> Some(33.3), ("Noisy-L", "FSim_s") -> Some(75.1),
    ("Noisy-L", "FSim_dp") -> Some(73.2),
    ("Combined", "NAGA") -> Some(21.2), ("Combined", "G-Finder") -> Some(40.9),
    ("Combined", "TSpan-1") -> None, ("Combined", "TSpan-3") -> None,
    ("Combined", "StrongSim") -> Some(29.2), ("Combined", "FSim_s") -> Some(76.6),
    ("Combined", "FSim_dp") -> Some(66.7))

  def matchers(): Seq[Matcher] = Seq(
    new NagaMatcher,
    new GFinderMatcher,
    new TSpanMatcher(1),
    new TSpanMatcher(3),
    new StrongSimMatcher,
    new FSimMatcher(Variant.S),
    new FSimMatcher(Variant.DP))

  final case class Row(scenario: String, matcher: String, f1: Double)

  /** One noised query instance with its ground truth. */
  def makeQuery(data: LocalGraph, scenario: String, rnd: Random): (LocalGraph, Array[Int]) = {
    val size = 3 + rnd.nextInt(11)
    val (q0, truth) = data.sampleConnectedSubgraph(size, rnd)
    val sigma = data.labelSet.toIndexedSeq.sorted
    // "up to 33%" noise, uniform — small queries can draw zero noise, which
    // is what lets exact methods keep partial credit in the paper's Table 6
    // (e.g. strong simulation at 50.0 on Noisy-E).
    def kE = (rnd.nextDouble() * 0.33 * q0.m).toInt
    def kL = (rnd.nextDouble() * 0.33 * q0.n).toInt
    val q = scenario match {
      case "Exact"   => q0
      case "Noisy-E" => q0.withAddedEdges(kE, rnd)
      case "Noisy-L" => q0.withPerturbedLabels(kL, sigma, rnd)
      case "Combined" => q0.withAddedEdges(kE, rnd).withPerturbedLabels(kL, sigma, rnd)
    }
    (q, truth)
  }

  def compute(dataNodes: Int = 6000, queriesPerScenario: Int = 15,
              seed: Long = 99L): Seq[Row] = {
    val data = GraphGen.amazonLike(dataNodes)
    val ms = matchers()
    for (scenario <- scenarios; m <- ms) yield {
      val rnd = new Random(seed) // same queries for every matcher
      var sum = 0.0
      for (_ <- 0 until queriesPerScenario) {
        val (q, truth) = makeQuery(data, scenario, rnd)
        sum += Matcher.f1(truth, m.matchQuery(q, data))
      }
      Row(scenario, m.name, 100.0 * sum / queriesPerScenario)
    }
  }

  def render(rows: Seq[Row]): String = {
    val names = matchers().map(_.name)
    val sb = new StringBuilder
    sb.append("Table 6 — avg pattern-matching F1 (%) paper/measured\n")
    sb.append(f"${"scenario"}%-10s" + names.map(n => f"$n%-22s").mkString + "\n")
    for (s <- scenarios) {
      sb.append(f"$s%-10s")
      for (n <- names) {
        val p = paper((s, n)).map(v => f"$v%.1f").getOrElse("-")
        val mv = rows.find(r => r.scenario == s && r.matcher == n).get.f1
        sb.append(f"${p + " / " + f"$mv%.1f"}%-22s")
      }
      sb.append("\n")
    }
    sb.toString
  }

  def main0(spark: SparkSession): String = render(compute())
}
