package repro.exp

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions.col
import repro.align._
import repro.core._
import repro.graph.{GraphFrames, LocalGraph, RdfVersions}

/** Table 9: RDF graph-alignment F1 on evolving versions G1-G2 and G1-G3.
  * The 2-/4-bisimulation baselines run on the *Spark* signature-refinement
  * engine ([[KBisimulation.signaturesSpark]] over the disjoint union); the
  * remaining aligners (Olap-, GSANA-, FINAL-, EWS-like, FSim_b, FSim_bj) run
  * on the local substrates. Ground truth: identity on shared node ids.
  */
object Table9 {

  val alignerNames: Seq[String] =
    Seq("2-bisim", "4-bisim", "Olap", "GSANA", "FINAL", "EWS", "FSim_b", "FSim_bj")

  /** Paper's Table 9 (F1 %). */
  val paper: Map[(String, String), Double] = Map(
    ("G1-G2", "2-bisim") -> 19.9, ("G1-G2", "4-bisim") -> 9.1,
    ("G1-G2", "Olap") -> 37.9, ("G1-G2", "GSANA") -> 11.8,
    ("G1-G2", "FINAL") -> 55.2, ("G1-G2", "EWS") -> 70.8,
    ("G1-G2", "FSim_b") -> 97.6, ("G1-G2", "FSim_bj") -> 96.5,
    ("G1-G3", "2-bisim") -> 53.0, ("G1-G3", "4-bisim") -> 10.9,
    ("G1-G3", "Olap") -> 37.6, ("G1-G3", "GSANA") -> 14.9,
    ("G1-G3", "FINAL") -> 52.7, ("G1-G3", "EWS") -> 65.3,
    ("G1-G3", "FSim_b") -> 96.9, ("G1-G3", "FSim_bj") -> 95.6)

  final case class Row(pair: String, aligner: String, f1: Double)

  /** k-bisimulation aligner backed by the distributed signature refinement. */
  final class SparkKBisimAligner(spark: SparkSession, k: Int) extends Aligner {
    val name = s"$k-bisim"
    def align(g1: LocalGraph, g2: LocalGraph): Map[Int, Seq[Int]] = {
      val union = g1.disjointUnion(g2)
      val sigs = KBisimulation.signaturesSpark(spark,
          GraphFrames.nodesDF(spark, union), GraphFrames.edgesDF(spark, union), k)
        .collect().map(r => r.getLong(0).toInt -> r.getLong(1)).toMap
      val byClass2 = (0 until g2.n).groupBy(v => sigs(g1.n + v))
      (0 until g1.n).map(u => u -> byClass2.getOrElse(sigs(u), Seq.empty).toSeq).toMap
    }
  }

  def aligners(spark: SparkSession): Seq[Aligner] = Seq(
    new SparkKBisimAligner(spark, 2),
    new SparkKBisimAligner(spark, 4),
    new OlapAligner,
    new GsanaAligner,
    new FinalAligner,
    new EwsAligner,
    new FSimAligner(Variant.B),
    new FSimAligner(Variant.BJ))

  def compute(spark: SparkSession, n3: Int = 1500): Seq[Row] = {
    val vs = RdfVersions.generate(n3 = n3)
    val pairs = Seq("G1-G2" -> (vs.g1, vs.g2), "G1-G3" -> (vs.g1, vs.g3))
    for ((pname, (a, b)) <- pairs; al <- aligners(spark)) yield {
      Row(pname, al.name, 100.0 * Aligner.f1Identity(a, al.align(a, b)))
    }
  }

  /** The Table-9 footnote check: exact bisimulation between versions yields
    * 0% F1 — no cross-version pair is exactly bisimilar under churn. Returns
    * the F1 of aligning by the exact b-simulation relation.
    */
  def exactBisimF1(g1: LocalGraph, g2: LocalGraph): Double = {
    val r = ExactSimulation.relation(g1, g2, Variant.B)
    val res = (0 until g1.n).map { u =>
      val row = r(u)
      u -> Iterator.iterate(row.nextSetBit(0))(i => row.nextSetBit(i + 1))
        .takeWhile(_ >= 0).toSeq
    }.toMap
    100.0 * Aligner.f1Identity(g1, res)
  }

  def render(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb.append("Table 9 — RDF alignment F1 (%) paper/measured\n")
    sb.append(f"${"pair"}%-8s" + alignerNames.map(n => f"$n%-16s").mkString + "\n")
    for (p <- Seq("G1-G2", "G1-G3")) {
      sb.append(f"$p%-8s")
      for (n <- alignerNames) {
        val mv = rows.find(r => r.pair == p && r.aligner == n).get.f1
        sb.append(f"${f"${paper((p, n))}%.1f" + "/" + f"$mv%.1f"}%-16s")
      }
      sb.append("\n")
    }
    sb.toString
  }

  def main0(spark: SparkSession): String = render(compute(spark))
}
