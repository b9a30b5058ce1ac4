package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.eval.Benches
import repro.synth.RealWorldSim

/** Table 4 — evolving explanations of the S&P 500 index.
  *
  * Paper: K = 4 segments at {2/6, 3/24, 8/25}; top-3 per segment:
  * (technology+, energy-, internet retail+), (technology-, financial-,
  * communication-), (technology+, consumer cyclical+, communication+),
  * (technology-, communication-, financial-). All category-level except the
  * internet-retail subcategory in segment 1.
  */
class Table4SP500Bench extends AnyFunSuite {

  test("Table 4: TSExplain recovers the published S&P 500 segmentation and contributors") {
    val sim = RealWorldSim.sp500()
    val run = Benches.runRealWorld(sim, TSConfig(filterRatio = Some(0.001)))
    println("=== Table 4 (S&P 500) ===")
    println(run.rendered)
    println(f"cut distance to paper's segmentation: ${run.cutDistancePercent}%.2f%%")
    println(f"paper top-3 cells reproduced: ${run.topMatchFraction * 100}%.1f%%")

    assert(run.result.explanation.scheme.k >= 3 && run.result.explanation.scheme.k <= 6,
      s"elbow K=${run.result.explanation.scheme.k}, paper has 4")
    assert(run.cutDistancePercent <= 5.0)
    assert(run.topMatchFraction >= 0.7)
  }

  test("Table 4 at the oracle K=4: near-exact reproduction incl. the subcategory pick") {
    val sim = RealWorldSim.sp500()
    val run = Benches.runRealWorld(sim, TSConfig(fixedK = Some(4), filterRatio = Some(0.001)))
    println("=== Table 4 at oracle K=4 ===")
    println(run.rendered)
    assert(run.cutDistancePercent <= 2.0)
    assert(run.topMatchFraction >= 0.9)
    // the one subcategory-level explanation of the paper's table
    val rendered = run.rendered
    assert(rendered.contains("subcategory=internet_retail"),
      "segment 1 must surface the internet_retail subcategory like the paper")
  }
}
