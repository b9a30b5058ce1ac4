package repro.baselines

/** FLUSS semantic segmentation (Gharghabi et al. [9]) reimplemented from the
  * matrix-profile description: compute each length-`w` subsequence's nearest
  * neighbour (z-normalized Euclidean, trivial-match exclusion), build the arc
  * curve (number of NN arcs crossing each position), normalize by the ideal
  * arc curve of a segmentation-free series (a parabola), and report the K−1
  * deepest minima of the corrected arc curve (CAC) with an exclusion zone.
  * The naive O(n²·w) matrix profile is ample at the paper's n ≤ 345.
  */
object Fluss {

  private def znorm(s: Array[Double], i: Int, w: Int): Array[Double] = {
    var mu = 0.0
    var t = 0
    while (t < w) { mu += s(i + t); t += 1 }
    mu /= w
    var sd = 0.0
    t = 0
    while (t < w) { val d = s(i + t) - mu; sd += d * d; t += 1 }
    sd = math.sqrt(sd / w)
    if (sd < 1e-12) Array.fill(w)(0.0)
    else Array.tabulate(w)(t => (s(i + t) - mu) / sd)
  }

  /** Nearest-neighbour index for every subsequence (the matrix profile index). */
  def profileIndex(s: Array[Double], w: Int): Array[Int] = {
    val n = s.length - w + 1
    require(n >= 2, s"window $w too large for series of ${s.length}")
    val subs = Array.tabulate(n)(i => znorm(s, i, w))
    val excl = math.max(1, w / 2)
    Array.tabulate(n) { i =>
      var best = -1
      var bestD = Double.PositiveInfinity
      var j = 0
      while (j < n) {
        if (math.abs(i - j) > excl) {
          var d = 0.0
          var t = 0
          val a = subs(i); val b = subs(j)
          while (t < w && d < bestD) { val x = a(t) - b(t); d += x * x; t += 1 }
          if (d < bestD) { bestD = d; best = j }
        }
        j += 1
      }
      if (best < 0) i else best
    }
  }

  /** Corrected arc curve in [0, 1] over subsequence positions. */
  def cac(s: Array[Double], w: Int): Array[Double] = {
    val idx = profileIndex(s, w)
    val n = idx.length
    // Arc count crossing each boundary between position t and t+1: +1 over
    // [min(i,nn), max(i,nn)) via a difference array.
    val diff = new Array[Double](n + 1)
    for (i <- idx.indices) {
      val j = idx(i)
      val lo = math.min(i, j); val hi = math.max(i, j)
      diff(lo) += 1; diff(hi) -= 1
    }
    val arcs = new Array[Double](n)
    var acc = 0.0
    for (t <- 0 until n) { acc += diff(t); arcs(t) = acc }
    // Edge correction (as in the reference implementation): positions within
    // ~5%·n or one window of either end are unreliable minima — pin to 1.
    val edge = math.max(w, (0.05 * n).toInt)
    Array.tabulate(n) { t =>
      if (t < edge || t >= n - edge) 1.0
      else {
        val ideal = 2.0 * t * (n - t) / n
        if (ideal <= 0) 1.0 else math.min(1.0, arcs(t) / ideal)
      }
    }
  }

  /** K-segmentation: the K−1 lowest CAC minima with an exclusion zone;
    * returns full cut-index list including endpoints (series coordinates —
    * subsequence positions are shifted by w/2 to the window center).
    */
  def segment(s: Array[Double], k: Int, w: Int): Vector[Int] = {
    val n = s.length
    if (k <= 1) return Vector(0, n - 1)
    val curve = cac(s, w)
    val excl = math.max(w, n / (2 * k))
    val chosen = scala.collection.mutable.ArrayBuffer.empty[Int]
    val order = curve.indices.sortBy(curve)
    val it = order.iterator
    while (chosen.size < k - 1 && it.hasNext) {
      val c = it.next()
      val pos = math.min(n - 2, math.max(1, c + w / 2))
      if (chosen.forall(x => math.abs(x - pos) >= excl)) chosen += pos
    }
    // Degenerate series can starve the exclusion zone; pad with evenly
    // spaced cuts so callers always receive exactly k segments.
    var fill = 1
    while (chosen.size < k - 1) {
      val pos = fill * (n - 1) / k
      if (pos > 0 && pos < n - 1 && !chosen.contains(pos)) chosen += pos
      fill += 1
    }
    (Vector(0, n - 1) ++ chosen).distinct.sorted
  }
}
