package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.GraphGen
import scala.util.Random

/** Fast shape checks of the experiment drivers (full paper-vs-measured runs
  * live in the bench project; these keep `sbt test` quick but meaningful).
  */
class ExpSmokeSpec extends AnyFunSuite {

  test("Table 2 cells: exact flags match the paper and fractional scores obey P2") {
    val cells = Table2.compute()
    assert(cells.size === 16)
    for (c <- cells) {
      val (paperExact, _) = Table2.paper((c.variant, c.v))
      assert(c.exact === paperExact, s"${c.variant} ${c.v}")
      if (c.exact) assert(c.score >= 1.0 - 1e-6, s"${c.variant} ${c.v}: ${c.score}")
      else assert(c.score < 1.0 - 1e-4, s"${c.variant} ${c.v}: ${c.score}")
    }
    assert(Table2.render(cells).contains("v4"))
  }

  test("Table 2: fractional scores rank v4 highest and v1 lowest per variant") {
    val cells = Table2.compute()
    for (variant <- Seq("s", "dp", "b", "bj")) {
      val byV = cells.filter(_.variant == variant).map(c => c.v -> c.score).toMap
      assert(byV("v4") === byV.values.max)
      assert(byV("v1") === byV.values.min)
    }
  }

  test("Table 6 query generator: scenario noise is applied (0..33%, can be zero)") {
    val data = GraphGen.amazonLike(800, seed = 1L)
    val (qe, te) = Table6.makeQuery(data, "Exact", new Random(1))
    assert(te.length === qe.n)
    // over several draws, Noisy-E adds edges and Noisy-L perturbs labels,
    // each bounded by 33% and sometimes zero
    var addedSome = false; var changedSome = false; var sawZero = false
    for (seed <- 1 to 20) {
      val rndE = new Random(seed)
      val (q0, _) = data.sampleConnectedSubgraph(10, new Random(seed))
      val (qn, tn) = Table6.makeQuery(data, "Noisy-E", rndE)
      if (qn.m > 0) addedSome = true
      val (ql, tl) = Table6.makeQuery(data, "Noisy-L", new Random(seed + 100))
      val changed = (0 until ql.n).count(i => ql.labels(i) != data.labels(tl(i)))
      assert(changed <= math.ceil(0.33 * ql.n))
      if (changed > 0) changedSome = true
      if (changed == 0) sawZero = true
    }
    assert(addedSome && changedSome && sawZero)
  }

  test("Table 6 paper reference table is complete") {
    for (s <- Table6.scenarios; m <- Table6.matchers().map(_.name))
      assert(Table6.paper.contains((s, m)), s"($s, $m)")
  }

  test("Table 4/5/7/8/9 paper reference tables are complete") {
    assert(Table4.paper.size === 8)
    assert(Table5.paper.size === 12)
    assert(Table78.paperTable7.size === 6 && Table78.paperTable8.size === 6)
    assert(Table9.paper.size === 16)
  }
}
