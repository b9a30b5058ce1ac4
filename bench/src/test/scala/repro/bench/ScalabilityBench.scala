package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Benches

/** Figure 17 (table-ized) — latency vs time series length on the synthetic
  * generator. Paper: Vanilla grows super-linearly (terminated past 100 s by
  * n = 6400) while the optimized pipeline stays interactive (982 ms at
  * n = 3200). We sweep shorter lengths (JVM vs C++) and assert the shape:
  * optimized ≪ vanilla, and optimized growth is sub-quadratic.
  */
class ScalabilityBench extends AnyFunSuite {

  test("Fig 17: optimized latency scales far better than vanilla in n") {
    val lengths = sys.env.getOrElse("BENCH_FIG17_LENGTHS", "100,200,400,800").split(",").map(_.trim.toInt).toSeq
    val vanillaCap = sys.env.getOrElse("BENCH_FIG17_VANILLA_CAP", "400").toInt
    // JIT warm-up
    Benches.scalability(Seq(100), vanillaCap = 100)
    val rows = Benches.scalability(lengths, vanillaCap)
    println("=== Fig 17 (latency vs series length, ms) ===")
    println(Benches.fmtTable(
      Seq("n", "Vanilla", "O1+O2"),
      rows.map(r => Seq(r.n.toString,
        r.vanillaMs.map(v => f"$v%.0f").getOrElse("(skipped)"), f"${r.optMs}%.0f"))))

    // at the largest length where vanilla ran, opt must be clearly faster
    val biggest = rows.filter(_.vanillaMs.isDefined).maxBy(_.n)
    assert(biggest.optMs < biggest.vanillaMs.get,
      f"n=${biggest.n}: opt ${biggest.optMs}%.0f ms !< vanilla ${biggest.vanillaMs.get}%.0f ms")

    // optimized growth between consecutive doublings stays sub-quadratic-ish
    val opt = rows.map(r => (r.n, r.optMs))
    for (Seq((n1, t1), (n2, t2)) <- opt.sliding(2) if n2 == 2 * n1 && t1 > 50) {
      assert(t2 / t1 < 8.0, f"opt latency grew ${t2 / t1}%.1fx from n=$n1 to n=$n2")
    }
  }
}
