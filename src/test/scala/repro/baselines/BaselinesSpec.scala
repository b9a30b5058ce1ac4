package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.synth.SyntheticGen
import scala.util.Random

class BaselinesSpec extends AnyFunSuite {

  /** Clean two-regime series: flat then steep. */
  def twoRegime(n: Int = 60, cut: Int = 30): Array[Double] =
    Array.tabulate(n)(t => if (t < cut) 10.0 + 0.01 * t else 10.0 + 5.0 * (t - cut))

  // --------------------------------------------------------------- BottomUp

  test("BottomUp recovers an exact piecewise-linear breakpoint") {
    val s = SyntheticGen.piecewiseLinear(50, Vector(0, 20, 49), Vector(0.0, 40.0, 11.0))
    val cuts = BottomUp.segment(s, 2)
    assert(cuts == Vector(0, 20, 49))
  }

  test("BottomUp recovers multiple breakpoints on clean data") {
    val s = SyntheticGen.piecewiseLinear(60, Vector(0, 15, 35, 59), Vector(0.0, 30.0, -10.0, 38.0))
    val cuts = BottomUp.segment(s, 3)
    assert(cuts == Vector(0, 15, 35, 59))
  }

  test("BottomUp returns exactly k segments") {
    val rnd = new Random(1)
    val s = Array.fill(40)(rnd.nextDouble() * 10)
    for (k <- 1 to 6) {
      val cuts = BottomUp.segment(s, k)
      assert(cuts.size == k + 1)
      assert(cuts.head == 0 && cuts.last == 39)
    }
  }

  test("BottomUp k=1 returns just the endpoints") {
    assert(BottomUp.segment(twoRegime(), 1) == Vector(0, 59))
  }

  test("interpError is zero on a straight line") {
    val s = Array.tabulate(10)(t => 3.0 * t + 1)
    assert(BottomUp.interpError(s, 0, 9) == 0.0)
  }

  test("interpError grows with deviation from linearity") {
    val line = Array.tabulate(10)(_.toDouble)
    val bent = line.clone(); bent(5) += 4.0
    assert(BottomUp.interpError(bent, 0, 9) > BottomUp.interpError(line, 0, 9))
  }

  // ------------------------------------------------------------------ FLUSS

  test("FLUSS profileIndex excludes trivial matches") {
    val rnd = new Random(2)
    val s = Array.fill(50)(rnd.nextDouble())
    val idx = Fluss.profileIndex(s, 5)
    for (i <- idx.indices) assert(math.abs(idx(i) - i) > 2, s"trivial match at $i")
  }

  test("FLUSS cac is within [0,1]") {
    val rnd = new Random(3)
    val s = Array.fill(80)(rnd.nextDouble() * 5)
    assert(Fluss.cac(s, 6).forall(v => v >= 0.0 && v <= 1.0))
  }

  test("FLUSS returns exactly k segments with endpoints") {
    val s = twoRegime(80, 40)
    for (k <- 2 to 5) {
      val cuts = Fluss.segment(s, k, w = 8)
      assert(cuts.size == k + 1, s"k=$k got $cuts")
      assert(cuts.head == 0 && cuts.last == 79)
    }
  }

  test("FLUSS detects an obvious regime change within tolerance") {
    // two very different repeating regimes (period 8 vs period 32)
    val n = 160
    val s = Array.tabulate(n)(t =>
      if (t < 80) math.sin(t * math.Pi / 4.0) else math.sin(t * math.Pi / 16.0))
    val cuts = Fluss.segment(s, 2, w = 8)
    val interior = cuts(1)
    assert(math.abs(interior - 80) <= 25, s"cut at $interior, expected near 80")
  }

  // -------------------------------------------------------------- NNSegment

  test("NNSegment novelty is zero near the borders") {
    val s = twoRegime()
    val prof = NNSegment.novelty(s, 8)
    assert(prof.take(8).forall(_ == 0.0))
    assert(prof.takeRight(7).forall(_ == 0.0))
  }

  test("NNSegment returns exactly k segments with endpoints") {
    val s = twoRegime(100, 50)
    for (k <- 2 to 5) {
      val cuts = NNSegment.segment(s, k, w = 10)
      assert(cuts.size == k + 1)
      assert(cuts.head == 0 && cuts.last == 99)
    }
  }

  test("NNSegment finds a shape change point") {
    val n = 120
    val s = Array.tabulate(n)(t => if (t < 60) math.sin(t / 2.0) else (t % 7).toDouble)
    val cuts = NNSegment.segment(s, 2, w = 12)
    assert(math.abs(cuts(1) - 60) <= 15, s"cut at ${cuts(1)}, expected near 60")
  }

  test("baselines handle k=1 degenerately") {
    val s = twoRegime()
    assert(Fluss.segment(s, 1, 8) == Vector(0, 59))
    assert(NNSegment.segment(s, 1, 8) == Vector(0, 59))
  }

  test("baselines are deterministic") {
    val s = twoRegime(90, 45)
    assert(Fluss.segment(s, 3, 8) == Fluss.segment(s, 3, 8))
    assert(NNSegment.segment(s, 3, 8) == NNSegment.segment(s, 3, 8))
    assert(BottomUp.segment(s, 3) == BottomUp.segment(s, 3))
  }
}
