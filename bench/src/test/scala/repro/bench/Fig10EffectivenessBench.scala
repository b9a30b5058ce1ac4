package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Benches

/** Figure 10 (table-ized) — distance-percent of TSExplain vs the three
  * explanation-agnostic baselines on the synthetic corpus, at the oracle K.
  *
  * Paper: TSExplain beats all baselines at every SNR; above SNR≈35 its
  * distance-percent is close to 0 while the baselines stay well above;
  * Bottom-Up is the strongest baseline.
  * Scale note: paper uses 20 datasets/SNR; default here is 6 (override with
  * BENCH_FIG10_DATASETS).
  */
class Fig10EffectivenessBench extends AnyFunSuite {

  test("Fig 10: TSExplain dominates the explanation-agnostic baselines") {
    val datasets = sys.env.getOrElse("BENCH_FIG10_DATASETS", "6").toInt
    val snrs = Seq(20.0, 25.0, 30.0, 35.0, 40.0, 45.0, 50.0)
    val rows = Benches.fig10(datasets, snrs)
    val methods = Benches.methodNames
    println(s"=== Fig 10 (avg distance percent vs SNR; $datasets datasets/SNR) ===")
    println(Benches.fmtTable(
      "SNR" +: methods,
      rows.map(r => r.snr.toInt.toString +: methods.map(m => f"${r.avgDistByMethod(m)}%.2f"))))

    val avg = methods.map(m => m -> rows.map(_.avgDistByMethod(m)).sum / rows.size).toMap
    println(avg.map { case (m, v) => f"$m avg=$v%.2f%%" }.mkString("  "))

    // TSExplain wins overall
    for (m <- methods if m != "TSExplain")
      assert(avg("TSExplain") < avg(m),
        f"TSExplain (${avg("TSExplain")}%.2f) should beat $m (${avg(m)}%.2f)")
    // near-zero distance on clean data
    val clean = rows.filter(_.snr >= 45).map(_.avgDistByMethod("TSExplain"))
    assert(clean.forall(_ <= 3.0), s"clean-data distance too high: $clean")
  }
}
