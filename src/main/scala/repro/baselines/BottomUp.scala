package repro.baselines

/** Bottom-Up piecewise-linear-approximation segmentation (Keogh et al. [21]).
  *
  * Starts from the finest segmentation (every adjacent point pair its own
  * segment) and repeatedly merges the adjacent segment pair whose merged
  * linear-interpolation error is smallest, until K segments remain.
  * Explanation-agnostic: operates on the aggregated series only.
  */
object BottomUp {

  /** Sum of squared residuals of the straight line joining the segment's two
    * endpoint values (visual PLA interpolation error).
    */
  def interpError(s: Array[Double], i: Int, j: Int): Double = {
    val v0 = s(i); val v1 = s(j)
    var e = 0.0
    var t = i + 1
    while (t < j) {
      val fit = v0 + (v1 - v0) * (t - i).toDouble / (j - i)
      val r = s(t) - fit
      e += r * r
      t += 1
    }
    e
  }

  /** Segment the series into `k` pieces; returns cut indices including the
    * endpoints 0 and n−1.
    */
  def segment(s: Array[Double], k: Int): Vector[Int] = {
    val n = s.length
    require(k >= 1 && k <= n - 1, s"k=$k out of range for n=$n")
    // Boundaries as a doubly linked list over point indices.
    val cuts = scala.collection.mutable.TreeSet.empty[Int]
    (0 until n).foreach(cuts += _)
    var nSegs = n - 1
    while (nSegs > k) {
      // Find the interior boundary whose removal (merging its two segments)
      // yields the smallest merged error.
      var bestCut = -1
      var bestErr = Double.PositiveInfinity
      val it = cuts.iterator.toArray
      var idx = 1
      while (idx < it.length - 1) {
        val left = it(idx - 1); val mid = it(idx); val right = it(idx + 1)
        val e = interpError(s, left, right)
        if (e < bestErr) { bestErr = e; bestCut = mid }
        idx += 1
      }
      cuts -= bestCut
      nSegs -= 1
    }
    cuts.toVector
  }
}
