package repro.align

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Variant
import repro.graph.RdfVersions

class AlignersSpec extends AnyFunSuite {

  private lazy val vs = RdfVersions.generate(n3 = 400)

  test("f1Identity: perfect singleton alignment scores 1") {
    val g = vs.g1
    val perfect = (0 until g.n).map(u => u -> Seq(u)).toMap
    assert(Aligner.f1Identity(g, perfect) === 1.0)
  }

  test("f1Identity: ties are penalized as 2/(1+|A|)") {
    val g = vs.g1
    val tied = (0 until g.n).map(u => u -> Seq(u, (u + 1) % g.n)).toMap
    assert(math.abs(Aligner.f1Identity(g, tied) - 2.0 / 3) < 1e-9)
  }

  test("f1Identity: misses score 0") {
    val g = vs.g1
    val wrong = (0 until g.n).map(u => u -> Seq((u + 1) % g.n)).toMap
    assert(Aligner.f1Identity(g, wrong) === 0.0)
  }

  test("aligning a graph to itself: FSim_b is near-perfect") {
    val f1 = Aligner.f1Identity(vs.g1, new FSimAligner(Variant.B).align(vs.g1, vs.g1))
    assert(f1 > 0.9, s"f1=$f1")
  }

  test("aligning a graph to itself: k-bisim recall is perfect (classes contain self)") {
    val res = new KBisimAligner(2).align(vs.g1, vs.g1)
    for (u <- 0 until vs.g1.n) assert(res(u).contains(u))
  }

  for (al <- Seq(new GsanaAligner, new FinalAligner, new EwsAligner)) {
    test(s"${al.name}: produces a one-to-one partial alignment") {
      val res = al.align(vs.g1, vs.g2)
      val targets = res.values.flatten.toSeq
      assert(targets.distinct.size === targets.size, "not injective")
      res.values.foreach(a => assert(a.size <= 1))
    }
  }

  test("EWS percolates well beyond its seeds on near-identical versions") {
    val al = new EwsAligner(numSeeds = 40)
    val res = al.align(vs.g2, vs.g3)
    assert(res.size > 200, s"only ${res.size} matched")
    val f1 = Aligner.f1Identity(vs.g2, res)
    assert(f1 > 0.3, s"f1=$f1")
  }

  test("FSim_b beats the exact-bisimulation aligner across versions (the paper's premise)") {
    val fsim = Aligner.f1Identity(vs.g1, new FSimAligner(Variant.B).align(vs.g1, vs.g2))
    val exact = repro.exp.Table9.exactBisimF1(vs.g1, vs.g2)
    assert(fsim * 100 > exact + 10, s"fsim=${fsim * 100} exactBisim=$exact")
  }

  test("4-bisim classes are finer than 2-bisim classes (lower alignment recall)") {
    val r2 = new KBisimAligner(2).align(vs.g1, vs.g2)
    val r4 = new KBisimAligner(4).align(vs.g1, vs.g2)
    val hits2 = (0 until vs.g1.n).count(u => r2(u).contains(u))
    val hits4 = (0 until vs.g1.n).count(u => r4(u).contains(u))
    assert(hits4 <= hits2)
  }

  test("Olap (out-only converged classes) differs from 2-bisim") {
    val ro = new OlapAligner().align(vs.g1, vs.g2)
    val r2 = new KBisimAligner(2).align(vs.g1, vs.g2)
    assert(ro !== r2)
  }
}
