package repro.baselines

/** NNSegment (LimeSegment [42]) reimplemented from its nearest-neighbour
  * changepoint idea: a position is a likely boundary when the window before
  * it and the window after it are dissimilar (z-normalized Euclidean). The
  * K−1 highest novelty peaks with an exclusion zone become the cuts.
  * Explanation-agnostic, like the original.
  */
object NNSegment {

  private def znormDist(a: Array[Double], b: Array[Double]): Double = {
    def zn(x: Array[Double]): Array[Double] = {
      val mu = x.sum / x.length
      val sd = math.sqrt(x.map(v => (v - mu) * (v - mu)).sum / x.length)
      if (sd < 1e-12) x.map(_ => 0.0) else x.map(v => (v - mu) / sd)
    }
    val za = zn(a); val zb = zn(b)
    math.sqrt(za.zip(zb).map { case (x, y) => (x - y) * (x - y) }.sum)
  }

  /** Novelty profile: dissimilarity of the two windows flanking each index. */
  def novelty(s: Array[Double], w: Int): Array[Double] = {
    val n = s.length
    Array.tabulate(n) { t =>
      if (t < w || t + w > n) 0.0
      else znormDist(s.slice(t - w, t), s.slice(t, t + w))
    }
  }

  /** K-segmentation via the K−1 strongest novelty peaks (exclusion-zoned);
    * returns full cut-index list including endpoints.
    */
  def segment(s: Array[Double], k: Int, w: Int): Vector[Int] = {
    val n = s.length
    if (k <= 1) return Vector(0, n - 1)
    val prof = novelty(s, w)
    val excl = math.max(w, n / (2 * k))
    val chosen = scala.collection.mutable.ArrayBuffer.empty[Int]
    val order = prof.indices.sortBy(i => -prof(i))
    val it = order.iterator
    while (chosen.size < k - 1 && it.hasNext) {
      val c = it.next()
      if (c > 0 && c < n - 1 && prof(c) > 0 && chosen.forall(x => math.abs(x - c) >= excl))
        chosen += c
    }
    var fill = 1
    while (chosen.size < k - 1) {
      val pos = fill * (n - 1) / k
      if (pos > 0 && pos < n - 1 && !chosen.contains(pos)) chosen += pos
      fill += 1
    }
    (Vector(0, n - 1) ++ chosen).distinct.sorted
  }
}
