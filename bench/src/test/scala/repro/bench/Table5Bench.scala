package repro.bench

import repro.SparkSpec
import repro.exp.Table5

/** Bench for Table 5: sensitivity of FSimχ to the initialization function —
  * Pearson correlations between L_I / L_E / L_J score vectors, all variants.
  */
class Table5Bench extends SparkSpec {

  test("Table 5: Pearson correlations across initialization functions") {
    val rows = Table5.compute()
    println(Table5.render(rows))
    assert(rows.size === 12)
    // the paper's conclusion: FSimχ is not sensitive to the initialization
    // function — all coefficients stay high (paper's lowest is 0.922; our
    // synthetic labels are somewhat more mutually similar than NELL's, which
    // costs a little correlation on the Jaro-Winkler column — see
    // EXPERIMENTS.md)
    for (r <- rows) assert(r.coeff > 0.7, s"${r.pair} ${r.variant}: ${r.coeff}")
    // the string-function pair correlates near-perfectly, as in the paper
    for (r <- rows if r.pair == "L_J-L_E") assert(r.coeff > 0.9, s"${r.variant}: ${r.coeff}")
  }
}
