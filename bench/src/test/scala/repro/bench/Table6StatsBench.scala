package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Benches
import repro.synth.RealWorldSim

/** Table 6 — real-world dataset statistics: candidate explanation count ε,
  * ε after the 0.001 support filter, and series length n.
  *
  * Paper:          ε     filtered ε   n
  *   total-conf.   58    54           345
  *   daily-conf.   58    55           345
  *   S&P 500       610   329          151
  *   Liquor        8197  1812         128
  */
class Table6StatsBench extends AnyFunSuite {

  test("Table 6: dataset statistics match the paper's magnitudes") {
    val sims = Seq(
      RealWorldSim.covidTotal(),
      RealWorldSim.covidDaily(),
      RealWorldSim.sp500(),
      RealWorldSim.liquor(),
    )
    val rows = Benches.table6(sims)
    val paper = Map(
      "covid-total" -> (58, 54, 345),
      "covid-daily" -> (58, 55, 345),
      "sp500" -> (610, 329, 151),
      "liquor" -> (8197, 1812, 128),
    )
    println("=== Table 6 (dataset statistics; paper values in parentheses) ===")
    println(Benches.fmtTable(
      Seq("dataset", "ε", "filtered ε", "n"),
      rows.map { r =>
        val (pe, pf, pn) = paper(r.dataset)
        Seq(r.dataset, s"${r.epsilon} ($pe)", s"${r.filteredEpsilon} ($pf)", s"${r.n} ($pn)")
      }))

    val byName = rows.map(r => r.dataset -> r).toMap
    // covid: exact ε (58 states) and exact n (345 days)
    assert(byName("covid-total").epsilon == 58)
    assert(byName("covid-daily").epsilon == 58)
    assert(byName("covid-daily").n == 345)
    // covid filter keeps nearly all states
    assert(byName("covid-daily").filteredEpsilon >= 50)
    // sp500: deduplicated hierarchy ε is exactly the paper's 610
    assert(byName("sp500").epsilon == 610)
    assert(byName("sp500").filteredEpsilon < 610, "filter must remove something")
    // liquor: thousands of candidates, filter cuts a large fraction
    val lq = byName("liquor")
    assert(lq.epsilon > 2000 && lq.epsilon < 20000)
    assert(lq.filteredEpsilon < lq.epsilon * 0.8,
      s"filter removed too little: ${lq.filteredEpsilon}/${lq.epsilon}")
    assert(lq.n >= 120 && lq.n <= 132)
  }
}
