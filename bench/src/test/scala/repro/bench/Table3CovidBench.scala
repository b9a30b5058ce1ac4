package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.eval.Benches
import repro.synth.RealWorldSim

/** Table 3 — evolving explanations of Covid daily-confirmed-cases.
  *
  * Paper: K = 7 segments at {3/7, 4/7, 5/25, 7/16, 9/9, 11/10} with top-3
  * states (WA,NY,CA / NY,NJ,MA / NY-,NJ-,CA+ / FL,TX,CA / FL-,TX-,CA- /
  * IL,TX,WI / CA,NY,IL-). Our dataset is the simulator with that ground
  * truth planted; TSExplain must re-discover it end-to-end (elbow K).
  */
class Table3CovidBench extends AnyFunSuite {

  test("Table 3: TSExplain recovers the published Covid daily segmentation and contributors") {
    val sim = RealWorldSim.covidDaily()
    // the paper applies a moving average to very fuzzy daily series before
    // explaining (§7.4); the daily sim carries per-day noise, so do the same
    val run = Benches.runRealWorld(sim, TSConfig(smoothWindow = Some(5)))
    println("=== Table 3 (covid daily-confirmed-cases) ===")
    println(run.rendered)
    println(f"cut distance to paper's segmentation: ${run.cutDistancePercent}%.2f%%")
    println(f"paper top-3 cells reproduced: ${run.topMatchFraction * 100}%.1f%%")

    assert(run.result.explanation.scheme.k >= 5 && run.result.explanation.scheme.k <= 9,
      s"elbow K=${run.result.explanation.scheme.k}, paper has 7")
    assert(run.cutDistancePercent <= 5.0, f"cuts off by ${run.cutDistancePercent}%.2f%%")
    assert(run.topMatchFraction >= 0.7,
      f"only ${run.topMatchFraction * 100}%.0f%% of Table 3 cells reproduced")
  }

  test("Table 3 at the oracle K=7: near-exact reproduction") {
    val sim = RealWorldSim.covidDaily()
    val run = Benches.runRealWorld(sim, TSConfig(fixedK = Some(7)))
    println("=== Table 3 at oracle K=7 ===")
    println(run.rendered)
    assert(run.cutDistancePercent <= 2.0, f"cuts off by ${run.cutDistancePercent}%.2f%%")
    assert(run.topMatchFraction >= 0.85)
  }

  test("Table 3 with O1+O2 optimizations: same quality") {
    val sim = RealWorldSim.covidDaily()
    val run = Benches.runRealWorld(sim, TSConfig(fixedK = Some(7)).withAllOpts)
    assert(run.cutDistancePercent <= 3.0)
    assert(run.topMatchFraction >= 0.8)
  }
}
