package repro.synth

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class SyntheticGenSpec extends AnyFunSuite {

  test("generation is deterministic in the seed") {
    val a = SyntheticGen.generate(n = 100, snrDb = 35, seed = 99)
    val b = SyntheticGen.generate(n = 100, snrDb = 35, seed = 99)
    assert(a.truthCuts == b.truthCuts)
    assert(a.cube.total.toSeq == b.cube.total.toSeq)
  }

  test("different seeds give different datasets") {
    val a = SyntheticGen.generate(seed = 1)
    val b = SyntheticGen.generate(seed = 2)
    assert(a.cube.total.toSeq != b.cube.total.toSeq)
  }

  test("ground-truth K is within the paper's 2..10 range") {
    for (seed <- 1 to 20) {
      val ds = SyntheticGen.generate(seed = seed)
      assert(ds.k >= 2 && ds.k <= 10, s"seed $seed K=${ds.k}")
      assert(ds.truthCuts.size == ds.k - 1)
    }
  }

  test("segments have the minimum spacing used for ground-truth validity") {
    for (seed <- 1 to 10) {
      val ds = SyntheticGen.generate(seed = seed)
      val all = 0 +: ds.truthCuts :+ (ds.cube.n - 1)
      assert(all.sliding(2).forall { case Seq(a, b) => b - a >= 6 })
    }
  }

  test("the cube has three order-1 category explanations") {
    val ds = SyntheticGen.generate(seed = 3)
    assert(ds.cube.epsilon == 3)
    assert(ds.cube.expls.map(_.toString).toSet == Set("category=a1", "category=a2", "category=a3"))
  }

  test("total is the sum of the category series") {
    val ds = SyntheticGen.generate(seed = 4)
    for (t <- 0 until ds.cube.n) {
      val s = ds.cube.series.map(_(t)).sum
      assert(math.abs(ds.cube.total(t) - s) < 1e-9)
    }
  }

  test("clean per-category series are piecewise linear with alternating trends") {
    val ds = SyntheticGen.generate(n = 100, snrDb = 50, seed = 5)
    for ((_, clean) <- ds.cleanSeries) {
      // detect sign changes of the slope; consecutive distinct slopes alternate
      val slopes = clean.sliding(2).map { case Array(a, b) => b - a }.toVector
      val distinct = slopes.foldLeft(Vector.empty[Double]) { (acc, s) =>
        if (acc.nonEmpty && math.abs(acc.last - s) < 1e-9) acc else acc :+ s
      }
      for (Vector(s1, s2) <- distinct.sliding(2))
        assert(s1 * s2 < 0, "adjacent segment trends must alternate direction")
    }
  }

  test("measured SNR (variance convention) is close to the requested level") {
    val target = 30.0
    val ds = SyntheticGen.generate(n = 100, snrDb = target, seed = 6)
    for (((_, clean), idx) <- ds.cleanSeries.zipWithIndex) {
      val noisy = ds.cube.series(ds.cube.idOf(ds.cube.expls(idx)))
      val noise = clean.zip(noisy).map { case (c, x) => x - c }
      val mu = clean.sum / clean.length
      val ps = clean.map(v => (v - mu) * (v - mu)).sum / clean.length
      val pn = noise.map(v => v * v).sum / noise.length
      val snr = 10 * math.log10(ps / pn)
      assert(math.abs(snr - target) < 6.0, s"measured SNR $snr vs target $target")
    }
  }

  test("higher SNR means less noise") {
    def noisePower(snr: Double): Double = {
      val ds = SyntheticGen.generate(n = 100, snrDb = snr, seed = 7)
      ds.cleanSeries.zipWithIndex.map { case ((_, clean), i) =>
        clean.zip(ds.cube.series(i)).map { case (c, x) => (x - c) * (x - c) }.sum
      }.sum
    }
    assert(noisePower(20) > noisePower(50))
  }

  test("corpus produces datasets × SNR levels") {
    val c = SyntheticGen.corpus(datasets = 3, snrs = Seq(20, 35, 50))
    assert(c.size == 9)
    assert(c.map(_._1).distinct == Seq(20.0, 35.0, 50.0))
  }

  test("records emission reproduces the cube under fromRecords") {
    val ds = SyntheticGen.generate(n = 30, snrDb = 40, seed = 8)
    val rebuilt = ExplCube.fromRecords(Seq("category"), (0 until 30).map(_.toString),
      SyntheticGen.records(ds))
    assert(rebuilt.epsilon == ds.cube.epsilon)
    for (e <- rebuilt.expls) {
      val a = rebuilt.series(rebuilt.idOf(e))
      val b = ds.cube.series(ds.cube.idOf(e))
      assert(a.zip(b).forall { case (x, y) => math.abs(x - y) < 1e-9 })
    }
  }

  test("piecewiseLinear interpolates anchors exactly") {
    val s = SyntheticGen.piecewiseLinear(5, Vector(0, 2, 4), Vector(0.0, 10.0, 0.0))
    assert(s.toSeq == Seq(0.0, 5.0, 10.0, 5.0, 0.0))
  }
}
