package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Benches

/** Figure 6 (table-ized) — effectiveness of the within-segment variance
  * designs: average rank (1 = best of the 8 metrics) of each metric's
  * ground-truth score across random segmentation samples, per SNR level.
  *
  * Paper: tse has the best (lowest) average rank at every SNR; at SNR=50 all
  * metrics converge to rank 1 (the ground truth scores lowest for all).
  * Scale note: the paper uses 20 datasets/SNR × 10000 samples; we default to
  * 4 × 2000 (override with BENCH_FIG6_DATASETS / BENCH_FIG6_SAMPLES).
  */
class Fig6MetricsBench extends AnyFunSuite {

  test("Fig 6: tse is the most effective variance metric across SNR levels") {
    val datasets = sys.env.getOrElse("BENCH_FIG6_DATASETS", "4").toInt
    val samples = sys.env.getOrElse("BENCH_FIG6_SAMPLES", "2000").toInt
    val snrs = Seq(20.0, 25.0, 30.0, 35.0, 40.0, 45.0, 50.0)
    val rows = Benches.fig6(datasets, snrs, samples)
    val metrics = repro.core.VarianceMetric.all.map(_.name)
    println(s"=== Fig 6 (avg metric rank vs SNR; $datasets datasets/SNR, $samples samples) ===")
    println(Benches.fmtTable(
      "SNR" +: metrics,
      rows.map(r => r.snr.toInt.toString +: metrics.map(m => f"${r.avgRankByMetric(m)}%.2f"))))

    // tse's average rank across all SNRs is the best (or tied best)
    val avgByMetric = metrics.map(m => m -> rows.map(_.avgRankByMetric(m)).sum / rows.size).toMap
    val tse = avgByMetric("tse")
    for ((m, v) <- avgByMetric if m != "tse")
      assert(tse <= v + 0.35, f"tse ($tse%.2f) should rank no worse than $m ($v%.2f)")
    assert(avgByMetric.values.min >= tse - 1e-9 || tse <= avgByMetric.values.min + 0.35)

    // at SNR=50 (cleanest) tse is at/near rank 1
    val clean = rows.find(_.snr == 50.0).get
    assert(clean.avgRankByMetric("tse") <= 3.0,
      f"tse rank at SNR=50 is ${clean.avgRankByMetric("tse")}%.2f")
  }
}
