package repro.synth

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class RealWorldSimSpec extends AnyFunSuite {

  /** Top-m of a segment, rendered through the canonical (deduplicated)
    * explanation names, as the paper's tables present them.
    */
  def topOn(cube: ExplCube, seg: Segment, m: Int = 3): Vector[(String, Int)] = {
    val t = new CascadingAnalysts(cube, m).topIds(seg)
    t.ids.indices.map(r => (cube.canonicalExpl(t.ids(r)).toString, t.taus(r))).toVector
  }

  // ----------------------------------------------------------------- Covid

  test("covid daily axis spans 2020-01-22..2020-12-31 = 345 days") {
    val sim = RealWorldSim.covidDaily()
    assert(sim.cube.n == 345)
    assert(sim.cube.times.head == "2020-01-22" && sim.cube.times.last == "2020-12-31")
  }

  test("covid has 58 states (ε = 58)") {
    assert(RealWorldSim.covidDaily().cube.epsilon == 58)
  }

  test("covid truth cuts are at the paper's Table 3 boundaries") {
    val sim = RealWorldSim.covidDaily()
    val dates = sim.truthCuts.map(sim.cube.times)
    assert(dates == Vector("2020-03-07", "2020-04-07", "2020-05-25", "2020-07-16", "2020-09-09", "2020-11-10"))
  }

  test("covid: CA on each designed segment reproduces Table 3's top-3 (paper ground truth)") {
    val sim = RealWorldSim.covidDaily()
    val bounds = 0 +: sim.truthCuts :+ (sim.cube.n - 1)
    for ((seg, want) <- bounds.sliding(2).toVector.zip(sim.expected)) {
      val got = topOn(sim.cube, Segment(seg(0), seg(1)))
      assert(got == want, s"segment ${sim.cube.times(seg(0))}..${sim.cube.times(seg(1))}: got $got want $want")
    }
  }

  test("covid total is the running sum of daily") {
    val d = RealWorldSim.covidDaily()
    val t = RealWorldSim.covidTotal()
    val id = d.cube.idOf(Expl.of("state" -> "New York"))
    val daily = d.cube.series(id)
    val total = t.cube.series(t.cube.idOf(Expl.of("state" -> "New York")))
    var acc = 0.0
    for (i <- daily.indices) {
      acc += daily(i)
      assert(math.abs(total(i) - acc) < 1e-6)
    }
  }

  test("covid records emission rebuilds the cube") {
    val sim = RealWorldSim.covidDaily()
    val rebuilt = ExplCube.fromRecords(Seq("state"), sim.cube.times, sim.records())
    assert(rebuilt.epsilon == 58)
    val e = Expl.of("state" -> "California")
    assert(rebuilt.series(rebuilt.idOf(e)).zip(sim.cube.series(sim.cube.idOf(e)))
      .forall { case (a, b) => math.abs(a - b) < 1e-9 })
  }

  // ---------------------------------------------------------------- S&P 500

  test("sp500 full conjunction cube has 2215 nodes; hierarchy dedup gives the paper's ε = 610") {
    val sim = RealWorldSim.sp500()
    assert(sim.cube.epsilon == 2215) // 503·4 + 96·2 + 11
    val dedup = sim.cube.dedupIdenticalSeries
    assert(dedup.epsilon == 610) // 503 stocks + 96 subcategories + 11 categories
    assert(dedup.expls.count(e => e.order == 1 && e.preds.head.attr == "stock") == 503)
    assert(dedup.expls.count(e => e.order == 1 && e.preds.head.attr == "subcategory") == 96)
    assert(dedup.expls.count(e => e.order == 1 && e.preds.head.attr == "category") == 11)
  }

  test("sp500 canonicalExpl maps FD-duplicate conjunctions to their minimal form") {
    val sim = RealWorldSim.sp500()
    val full = Expl.of("category" -> "consumer_cyclical", "subcategory" -> "internet_retail")
    assert(sim.cube.contains(full))
    assert(sim.cube.canonicalExpl(sim.cube.idOf(full)) == Expl.of("subcategory" -> "internet_retail"))
  }

  test("sp500 axis is the 2020-01-02..2020-10-01 weekdays") {
    val sim = RealWorldSim.sp500()
    assert(sim.cube.times.head == "2020-01-02" && sim.cube.times.last == "2020-10-01")
    assert(sim.cube.n >= 150 && sim.cube.n <= 200)
  }

  test("sp500 truth cuts are at 2/6, 3/24, 8/25 (Table 4, K=4)") {
    val sim = RealWorldSim.sp500()
    assert(sim.truthCuts.map(sim.cube.times) == Vector("2020-02-06", "2020-03-24", "2020-08-25"))
  }

  test("sp500: CA on each designed segment reproduces Table 4's top-3") {
    val sim = RealWorldSim.sp500()
    val bounds = 0 +: sim.truthCuts :+ (sim.cube.n - 1)
    for ((seg, want) <- bounds.sliding(2).toVector.zip(sim.expected)) {
      val got = topOn(sim.cube, Segment(seg(0), seg(1)))
      assert(got == want, s"segment ${sim.cube.times(seg(0))}..${sim.cube.times(seg(1))}: got $got want $want")
    }
  }

  test("sp500 total equals the sum over categories") {
    val sim = RealWorldSim.sp500()
    val catIds = sim.cube.expls.zipWithIndex.collect {
      case (e, i) if e.order == 1 && e.preds.head.attr == "category" => i
    }
    for (t <- 0 until sim.cube.n by 17) {
      val s = catIds.map(sim.cube.series(_)(t)).sum
      assert(math.abs(s - sim.cube.total(t)) < 1e-6)
    }
  }

  test("sp500 records rebuild matches the cube") {
    val sim = RealWorldSim.sp500()
    val rebuilt = ExplCube
      .fromRecords(Seq("category", "subcategory", "stock"), sim.cube.times, sim.records())
    assert(rebuilt.epsilon == sim.cube.epsilon)
    assert(rebuilt.dedupIdenticalSeries.epsilon == 610)
  }

  // ----------------------------------------------------------------- Liquor

  test("liquor axis is the 2020-01-02..2020-06-30 weekdays (~129 days, paper n=128)") {
    val sim = RealWorldSim.liquor()
    assert(sim.cube.times.head == "2020-01-02" && sim.cube.times.last == "2020-06-30")
    assert(sim.cube.n >= 125 && sim.cube.n <= 132, s"n=${sim.cube.n}")
  }

  test("liquor truth cuts are at the paper's Table 5 boundaries (K=7)") {
    val sim = RealWorldSim.liquor()
    assert(sim.truthCuts.map(sim.cube.times) ==
      Vector("2020-01-20", "2020-03-06", "2020-03-31", "2020-04-21", "2020-05-08", "2020-06-10"))
  }

  test("liquor cube has thousands of candidate explanations (paper ε = 8197)") {
    val sim = RealWorldSim.liquor()
    assert(sim.cube.epsilon > 2000, s"ε=${sim.cube.epsilon}")
    assert(sim.cube.epsilon < 20000, s"ε=${sim.cube.epsilon}")
  }

  test("liquor: CA on each designed segment reproduces Table 5's top-3") {
    val sim = RealWorldSim.liquor()
    val bounds = 0 +: sim.truthCuts :+ (sim.cube.n - 1)
    for ((seg, want) <- bounds.sliding(2).toVector.zip(sim.expected)) {
      val got = topOn(sim.cube, Segment(seg(0), seg(1)))
      assert(got == want, s"segment ${sim.cube.times(seg(0))}..${sim.cube.times(seg(1))}: got $got want $want")
    }
  }

  test("liquor support filter reduces ε substantially (paper: 8197 → 1812)") {
    val sim = RealWorldSim.liquor()
    val filtered = sim.cube.filtered(0.001)
    assert(filtered.epsilon < sim.cube.epsilon)
    assert(filtered.epsilon > 50)
  }

  test("liquor CN/VN marginals stay below the designed top-3 in every segment") {
    val sim = RealWorldSim.liquor()
    val bounds = 0 +: sim.truthCuts :+ (sim.cube.n - 1)
    for (Vector(i, j) <- bounds.sliding(2)) {
      val seg = Segment(i, j)
      val top3Min = topOn(sim.cube, seg).map(_._1)
        .map(s => sim.cube.gamma(sim.cube.idOf(parse(s)), seg)).min
      for ((e, id) <- sim.cube.expls.zipWithIndex
           if e.order == 1 && (e.preds.head.attr == "CN" || e.preds.head.attr == "VN"))
        assert(sim.cube.gamma(id, seg) < top3Min, s"$e beats a designed top-3 in [$i,$j]")
    }
  }

  private def parse(s: String): Expl =
    Expl.of(s.split(" & ").map { kv => val Array(a, v) = kv.split("="); a -> v }.toSeq: _*)

  test("simulators are deterministic in their seeds") {
    val a = RealWorldSim.liquor(seed = 5)
    val b = RealWorldSim.liquor(seed = 5)
    assert(a.cube.total.toSeq == b.cube.total.toSeq)
    val c = RealWorldSim.covidDaily(seed = 5)
    val d = RealWorldSim.covidDaily(seed = 5)
    assert(c.cube.total.toSeq == d.cube.total.toSeq)
  }
}
