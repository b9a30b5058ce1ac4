package repro.synth

import repro.core._
import scala.util.Random

/** Synthetic datasets with ground-truth evolving explanations (§4.2.1).
  *
  * Each dataset is one relation with schema (T, sales, category) and three
  * categories a1..a3. Every category's series is piecewise linear with
  * randomly placed cutting points and *alternating* up/down trends, which
  * makes every cut necessary; the ground-truth segmentation of the aggregated
  * series is the union of the per-category cuts. Gaussian noise is added per
  * category at a target signal-to-noise ratio in dB.
  */
object SyntheticGen {

  final case class Dataset(
      cube: ExplCube,
      /** Interior ground-truth cut indices (excludes endpoints). */
      truthCuts: Vector[Int],
      /** Ground-truth segment count K = truthCuts.size + 1. */
      k: Int,
      /** Noise-free per-category series, for relation emission. */
      cleanSeries: Vector[(String, Array[Double])],
  ) {
    def truthScheme(n: Int): SegScheme = SegScheme(0 +: truthCuts :+ (n - 1))
  }

  /** Piecewise-linear series through `values` at `cutIdx` breakpoints. */
  def piecewiseLinear(n: Int, cutIdx: Vector[Int], values: Vector[Double]): Array[Double] = {
    require(cutIdx.head == 0 && cutIdx.last == n - 1 && cutIdx.size == values.size)
    val out = new Array[Double](n)
    for (Vector((i0, v0), (i1, v1)) <- cutIdx.zip(values).sliding(2)) {
      var t = i0
      while (t <= i1) {
        out(t) = v0 + (v1 - v0) * (t - i0).toDouble / (i1 - i0)
        t += 1
      }
    }
    out
  }

  /** Additive Gaussian noise at `snrDb` relative to the series' AC power
    * (variance). The trend series carry a large DC offset, so the variance
    * convention makes SNR_dB govern *structural* noise — calibrated so the
    * reproduction matches the paper's reported behaviour across SNR 20..50
    * (TSExplain ≈ 0 distance above SNR 35, §7.3).
    */
  def addNoise(s: Array[Double], snrDb: Double, rnd: Random): Array[Double] = {
    val mean = s.sum / s.length
    val power = s.map(v => (v - mean) * (v - mean)).sum / s.length
    val sigma = math.sqrt(power / math.pow(10.0, snrDb / 10.0))
    s.map(v => v + rnd.nextGaussian() * sigma)
  }

  /** One random dataset. Cuts per category: 0..3, min spacing 6 points; the
    * union K is kept in the paper's 2..10 range by rejection.
    */
  def generate(n: Int = 100, snrDb: Double = 35.0, seed: Long = 0, nCats: Int = 3): Dataset = {
    require(n >= 20, s"need n ≥ 20 for spacing-6 cuts (got $n)")
    val rnd = new Random(seed)
    var attempt = 0
    while (attempt < 200) {
      attempt += 1
      val perCat = Vector.tabulate(nCats) { _ =>
        val nCuts = rnd.nextInt(4) // 0..3 interior cuts
        val cuts = scala.collection.mutable.SortedSet.empty[Int]
        var tries = 0
        while (cuts.size < nCuts && tries < 100) {
          val c = 6 + rnd.nextInt(n - 12)
          if ((cuts + 0 + (n - 1)).forall(x => x == c || math.abs(x - c) >= 6)) cuts += c
          tries += 1
        }
        0 +: cuts.toVector :+ (n - 1)
      }
      val union = perCat.flatMap(_.drop(1).dropRight(1)).distinct.sorted
      val k = union.size + 1
      val spacingOk = (0 +: union :+ (n - 1)).sliding(2).forall { case Seq(a, b) => b - a >= 6 }
      if (k >= 2 && k <= 10 && spacingOk) {
        val clean = perCat.zipWithIndex.map { case (cuts, ci) =>
          // alternating up/down linear trends: values at the breakpoints.
          // Slopes are large relative to the baseline (as in the paper's
          // Figure 5, where per-segment swings are comparable to the level),
          // so SNR_dB controls structural noise the same way.
          val base = 20.0 + rnd.nextDouble() * 40.0
          var dir = if (rnd.nextBoolean()) 1.0 else -1.0
          val values = Vector.newBuilder[Double]
          var v = base
          values += v
          for (Vector(a, b) <- cuts.sliding(2)) {
            val slope = (2.0 + rnd.nextDouble() * 4.0) * dir
            v += slope * (b - a)
            values += v
            dir = -dir
          }
          s"a${ci + 1}" -> piecewiseLinear(n, cuts, values.result())
        }
        val noisy = clean.map { case (c, s) => c -> addNoise(s, snrDb, rnd) }
        val total = new Array[Double](n)
        for ((_, s) <- noisy; t <- 0 until n) total(t) += s(t)
        val cube = ExplCube.fromSeries(
          Seq("category"),
          (0 until n).map(_.toString),
          total,
          noisy.map { case (c, s) => Expl.of("category" -> c) -> s },
        )
        return Dataset(cube, union, k, clean)
      }
    }
    throw new IllegalStateException(s"could not generate dataset for seed=$seed")
  }

  /** The §7.1.1 corpus: `datasets` datasets at each SNR level in `snrs`. */
  def corpus(datasets: Int, snrs: Seq[Double], n: Int = 100): Seq[(Double, Dataset)] =
    for {
      snr <- snrs
      i <- 0 until datasets
    } yield snr -> generate(n = n, snrDb = snr, seed = 7919L * i + 13)

  /** Relation-shaped emission: rows (categoryValue, timeIndex, measure) for
    * the Spark cube path — SUM(measure) reproduces the noisy series.
    */
  def records(ds: Dataset): Seq[(Map[String, String], Int, Double)] =
    for {
      (e, s) <- ds.cube.expls.zip(ds.cube.series).toSeq
      t <- s.indices
    } yield (Map("category" -> e.preds.head.value), t, s(t))
}
