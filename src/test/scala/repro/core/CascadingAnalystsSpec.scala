package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class CascadingAnalystsSpec extends AnyFunSuite {

  /** Random small cube over `attrs` attributes with `vals` values each;
    * series length 2 so every γ is just a signed delta.
    */
  def randomCube(rnd: Random, attrs: Int = 2, vals: Int = 3, n: Int = 2): ExplCube = {
    val attrNames = (0 until attrs).map(i => s"A$i")
    val recs = for {
      combo <- attrNames.map(a => (0 until vals).map(v => a -> s"v$v")).foldLeft(Seq(Seq.empty[(String, String)]))((acc, col) => acc.flatMap(pfx => col.map(pfx :+ _)))
      t <- 0 until n
    } yield (combo.toMap, t, rnd.nextDouble() * 20 - 10)
    ExplCube.fromRecords(attrNames, (0 until n).map(_.toString), recs, maxOrder = 3)
  }

  def validate(cube: ExplCube, top: TopIds, seg: Segment, m: Int, maxOrder: Int): Unit = {
    assert(top.ids.length <= m, "at most m explanations")
    val es = top.ids.map(cube.expls)
    for (e <- es) assert(e.order <= maxOrder, s"order bound violated by $e")
    for (i <- es.indices; j <- i + 1 until es.length)
      assert(es(i).nonOverlapping(es(j)), s"${es(i)} overlaps ${es(j)}")
    for (r <- top.ids.indices) {
      assert(top.gammas(r) == cube.gamma(top.ids(r), seg), "reported γ must match cube")
      assert(top.taus(r) == cube.tau(top.ids(r), seg), "reported τ must match cube")
    }
    assert(top.gammas.toSeq == top.gammas.toSeq.sortBy(-(_: Double)), "ranked by γ descending")
    assert(math.abs(top.best(m) - top.gammas.sum) < 1e-9, "Best[m] equals the selection's total")
  }

  test("DP equals the exponential reference on random 2-attribute cubes") {
    val rnd = new Random(7)
    for (trial <- 1 to 30) {
      val cube = randomCube(rnd)
      val seg = Segment(0, 1)
      for (m <- 1 to 3) {
        val ca = new CascadingAnalysts(cube, m)
        val got = ca.topIds(seg)
        val (bruteScore, _) = CascadingAnalystsBrute.topExpl(cube, seg, m)
        assert(math.abs(got.best(m) - bruteScore) < 1e-9, s"trial $trial m=$m")
        validate(cube, got, seg, m, 3)
      }
    }
  }

  test("DP equals the exponential reference on random 3-attribute cubes") {
    val rnd = new Random(13)
    for (trial <- 1 to 10) {
      val cube = randomCube(rnd, attrs = 3, vals = 2)
      val seg = Segment(0, 1)
      val ca = new CascadingAnalysts(cube, 3)
      val got = ca.topIds(seg)
      val (bruteScore, _) = CascadingAnalystsBrute.topExpl(cube, seg, 3)
      assert(math.abs(got.best(3) - bruteScore) < 1e-9, s"trial $trial")
      validate(cube, got, seg, 3, 3)
    }
  }

  test("single-attribute cube: top-m are simply the m largest |Δ| values") {
    val n = 2
    val series = Seq(
      Expl.of("a" -> "p") -> Array(0.0, 9.0),
      Expl.of("a" -> "q") -> Array(0.0, -7.0),
      Expl.of("a" -> "r") -> Array(0.0, 4.0),
      Expl.of("a" -> "s") -> Array(0.0, 1.0),
    )
    val total = Array(0.0, 7.0)
    val cube = ExplCube.fromSeries(Seq("a"), Seq("0", "1"), total, series)
    val top = new CascadingAnalysts(cube, 3).topIds(Segment(0, 1))
    assert(top.ids.map(cube.expls).map(_.toString).toSeq == Seq("a=p", "a=q", "a=r"))
    assert(top.gammas.toSeq == Seq(9.0, 7.0, 4.0))
    assert(top.taus.toSeq == Seq(1, -1, 1))
  }

  test("marginal-vs-cell choice: CA drills down when a refinement scores higher") {
    // a=x moves +10 overall but its b=1 slice moves +30 (b=2 moves -20):
    // the cell (a=x & b=1) should beat the marginal (a=x).
    val recs = Seq(
      (Map("a" -> "x", "b" -> "1"), 0, 0.0), (Map("a" -> "x", "b" -> "1"), 1, 30.0),
      (Map("a" -> "x", "b" -> "2"), 0, 20.0), (Map("a" -> "x", "b" -> "2"), 1, 0.0),
    )
    val cube = ExplCube.fromRecords(Seq("a", "b"), Seq("0", "1"), recs)
    val top = new CascadingAnalysts(cube, 1).topIds(Segment(0, 1))
    assert(top.ids.map(cube.expls).map(_.toString).toSeq == Seq("a=x & b=1"))
    assert(top.best(1) == 30.0)
  }

  test("CA selects the marginal when the whole slice moves together") {
    val recs = Seq(
      (Map("a" -> "x", "b" -> "1"), 0, 0.0), (Map("a" -> "x", "b" -> "1"), 1, 15.0),
      (Map("a" -> "x", "b" -> "2"), 0, 0.0), (Map("a" -> "x", "b" -> "2"), 1, 14.0),
    )
    val cube = ExplCube.fromRecords(Seq("a", "b"), Seq("0", "1"), recs)
    val top = new CascadingAnalysts(cube, 1).topIds(Segment(0, 1))
    assert(top.ids.map(cube.expls).map(_.toString).toSeq == Seq("a=x"))
    assert(top.best(1) == 29.0)
  }

  test("quota splits across sibling subtrees (Figure 8 shape)") {
    // two a-branches, each with two strong b-cells moving in opposite
    // directions (so every marginal nets to ~0): with m=4 all four cells
    // must be picked, splitting the quota 2+2 across the a-subtrees.
    val recs = Seq(
      (Map("a" -> "x", "b" -> "1"), 0, 0.0), (Map("a" -> "x", "b" -> "1"), 1, 10.0),
      (Map("a" -> "x", "b" -> "2"), 0, 9.0), (Map("a" -> "x", "b" -> "2"), 1, 0.0),
      (Map("a" -> "y", "b" -> "1"), 0, 8.0), (Map("a" -> "y", "b" -> "1"), 1, 0.0),
      (Map("a" -> "y", "b" -> "2"), 0, 0.0), (Map("a" -> "y", "b" -> "2"), 1, 7.0),
    )
    val cube = ExplCube.fromRecords(Seq("a", "b"), Seq("0", "1"), recs)
    val top = new CascadingAnalysts(cube, 4).topIds(Segment(0, 1))
    assert(top.ids.map(cube.expls).map(_.toString).sorted.toSeq ==
      Seq("a=x & b=1", "a=x & b=2", "a=y & b=1", "a=y & b=2"))
    assert(top.best(4) == 34.0)
  }

  test("Best vector is nondecreasing in the quota") {
    val rnd = new Random(29)
    for (_ <- 1 to 20) {
      val cube = randomCube(rnd)
      val top = new CascadingAnalysts(cube, 3).topIds(Segment(0, 1))
      assert(top.best.toSeq == top.best.toSeq.sorted)
      assert(top.best(0) == 0.0)
    }
  }

  test("maxOrder=1 restricts selections to single predicates") {
    val rnd = new Random(31)
    for (_ <- 1 to 10) {
      val cube = randomCube(rnd)
      val top = new CascadingAnalysts(cube, 3, maxOrder = 1).topIds(Segment(0, 1))
      assert(top.ids.map(cube.expls).forall(_.order == 1))
      validate(cube, top, Segment(0, 1), 3, 1)
      val brute = CascadingAnalystsBrute.topExpl(cube, Segment(0, 1), 3, maxOrder = 1)._1
      assert(math.abs(top.best(3) - brute) < 1e-9)
    }
  }

  test("memo reuse across segments returns the same answers as fresh solvers") {
    val rnd = new Random(37)
    val n = 6
    val recs = for {
      a <- Seq("x", "y", "z"); b <- Seq("1", "2"); t <- 0 until n
    } yield (Map("a" -> a, "b" -> b), t, rnd.nextDouble() * 10)
    val cube = ExplCube.fromRecords(Seq("a", "b"), (0 until n).map(_.toString), recs)
    val shared = new CascadingAnalysts(cube, 3)
    for (i <- 0 until n; j <- i + 1 until n) {
      val seg = Segment(i, j)
      val a = shared.topIds(seg)
      val b = new CascadingAnalysts(cube, 3).topIds(seg)
      assert(a.best.toSeq == b.best.toSeq, s"[$i,$j]")
      assert(a.ids.toSeq == b.ids.toSeq, s"[$i,$j]")
    }
  }

  test("a flat segment yields zero scores and an empty or zero-γ selection") {
    val cube = ExplCube.fromSeries(Seq("a"), Seq("0", "1"), Array(5.0, 5.0),
      Seq(Expl.of("a" -> "x") -> Array(2.0, 2.0), Expl.of("a" -> "y") -> Array(3.0, 3.0)))
    val top = new CascadingAnalysts(cube, 3).topIds(Segment(0, 1))
    assert(top.best(3) == 0.0)
    assert(top.gammas.forall(_ == 0.0))
  }

  test("pretty conversion preserves rank order, γ and τ") {
    val rnd = new Random(41)
    val cube = randomCube(rnd)
    val ca = new CascadingAnalysts(cube, 3)
    val ids = ca.topIds(Segment(0, 1))
    val pretty = CascadingAnalysts.pretty(cube, ids)
    assert(pretty.ranked.map(_.gamma) == ids.gammas.toVector)
    assert(pretty.ranked.map(_.tau) == ids.taus.toVector)
    assert(pretty.ranked.map(_.expl) == ids.ids.toVector.map(cube.expls))
  }
}
