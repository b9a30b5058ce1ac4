package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.eval.Benches
import repro.synth.RealWorldSim

/** Table 5 — evolving explanations of Iowa liquor sales.
  *
  * Paper: K = 7 segments at {1/20, 3/6, 3/31, 4/21, 5/8, 6/10}; the top-3
  * mix order-1 marginals (P=12, P=6, BV=1000, P=24, P=48) with order-2 cells
  * (BV=375&P=24, BV=1750&P=6, BV=750&P=12, BV=1750&P=12, BV=1000&P=12), and
  * the CN/VN attributes are never surfaced.
  */
class Table5LiquorBench extends AnyFunSuite {

  test("Table 5: TSExplain recovers the published liquor segmentation and contributors") {
    val sim = RealWorldSim.liquor()
    val run = Benches.runRealWorld(sim, TSConfig(filterRatio = Some(0.001), guessVerify = true))
    println("=== Table 5 (Liquor) ===")
    println(run.rendered)
    println(f"cut distance to paper's segmentation: ${run.cutDistancePercent}%.2f%%")
    println(f"paper top-3 cells reproduced: ${run.topMatchFraction * 100}%.1f%%")

    assert(run.result.explanation.scheme.k >= 5 && run.result.explanation.scheme.k <= 9,
      s"elbow K=${run.result.explanation.scheme.k}, paper has 7")
    assert(run.cutDistancePercent <= 6.0)
    assert(run.topMatchFraction >= 0.6)
  }

  test("Table 5 at the oracle K=7: near-exact reproduction") {
    val sim = RealWorldSim.liquor()
    val run = Benches.runRealWorld(sim,
      TSConfig(fixedK = Some(7), filterRatio = Some(0.001), guessVerify = true))
    println("=== Table 5 at oracle K=7 ===")
    println(run.rendered)
    assert(run.cutDistancePercent <= 3.0)
    assert(run.topMatchFraction >= 0.8)
  }

  test("Table 5: CN/VN never appear in the surfaced explanations (paper's observation)") {
    val sim = RealWorldSim.liquor()
    val run = Benches.runRealWorld(sim,
      TSConfig(fixedK = Some(7), filterRatio = Some(0.001), guessVerify = true))
    for ((_, top) <- run.result.explanation.perSegment; r <- top.ranked)
      assert(!r.expl.attrs.exists(Set("CN", "VN")),
        s"uninteresting attribute surfaced: ${r.expl}")
  }
}
