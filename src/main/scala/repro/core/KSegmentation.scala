package repro.core

/** Weighted within-segment variance |P|·var(P) for arbitrary segments
  * (Section 4.1.4, Eq. 7 and the alternative metrics of Section 4.2.2).
  *
  * Objects are the unit segments [p_x, p_x+1]; the centroid of a partition
  * [p_i, p_j] is the partition itself. Top-explanation lists are supplied by
  * `topFn` (full CA, guess-and-verify CA, …) and should be cached by the
  * caller — this class caches unit-object lists and pairwise object
  * distances, which are shared across all candidate partitions.
  */
final class SegmentCosts(
    val cube: ExplCube,
    val metric: VarianceMetric,
    topFn: Segment => TopIds,
) {
  private val ndcg = new Ndcg(cube)
  private val nUnits = cube.n - 1

  private val unitTopCache = new Array[TopIds](nUnits)
  private def unitTop(x: Int): TopIds = {
    var t = unitTopCache(x)
    if (t == null) { t = topFn(Segment(x, x + 1)); unitTopCache(x) = t }
    t
  }

  // Pairwise object-object distances, needed only by the allpair metrics.
  private lazy val pairDist: Array[Array[Double]] = {
    val d = Array.fill(nUnits)(new Array[Double](nUnits))
    var x = 0
    while (x < nUnits) {
      var y = x + 1
      while (y < nUnits) {
        val v = ndcg.dist(Segment(x, x + 1), unitTop(x), Segment(y, y + 1), unitTop(y))
        d(x)(y) = v; d(y)(x) = v
        y += 1
      }
      x += 1
    }
    d
  }

  private def sq(v: Double): Double = if (metric.squared) v * v else v

  /** |P|·var(P) for the partition spanning indices [i, j] (Eq. 7 weighted by
    * the object count, which is what the DP objective of Problem 1 sums).
    */
  def weightedVar(i: Int, j: Int): Double = {
    val len = j - i
    metric match {
      case VarianceMetric.AllPair | VarianceMetric.SAllPair =>
        if (len <= 1) 0.0
        else {
          var s = 0.0
          var x = i
          while (x < j) {
            var y = x + 1
            while (y < j) { s += sq(pairDist(x)(y)); y += 1 }
            x += 1
          }
          // AVG over the len*(len-1)/2 object pairs, weighted by |P| = len.
          len * (s / (len * (len - 1) / 2.0))
        }
      case _ =>
        val cseg = Segment(i, j)
        val ctop = topFn(cseg)
        var s = 0.0
        var x = i
        while (x < j) {
          val oseg = Segment(x, x + 1)
          val otop = unitTop(x)
          val d = metric match {
            case VarianceMetric.Tse | VarianceMetric.STse     => ndcg.dist(cseg, ctop, oseg, otop)
            case VarianceMetric.Dist1 | VarianceMetric.SDist1 => ndcg.dist1(cseg, ctop, otop)
            case VarianceMetric.Dist2 | VarianceMetric.SDist2 => ndcg.dist2(oseg, otop, ctop)
            case _                                            => throw new MatchError(metric)
          }
          s += sq(d)
          x += 1
        }
        s
    }
  }

  private val costCache = new java.util.HashMap[Long, java.lang.Double]()

  /** Memoized [[weightedVar]]. */
  def cost(i: Int, j: Int): Double = {
    val key = (i.toLong << 32) | j.toLong
    val hit = costCache.get(key)
    if (hit != null) hit.doubleValue()
    else {
      val v = weightedVar(i, j)
      costCache.put(key, v)
      v
    }
  }

  /** Objective Σ |P_k|·var(P_k) of a full segmentation scheme (Problem 1). */
  def objective(scheme: SegScheme): Double =
    scheme.segments.iterator.map(s => cost(s.i, s.j)).sum
}

/** The K-Segmentation dynamic program (Section 5.1, Eq. 11), generalized with
  * the two restrictions used by sketching: an optional maximum segment length
  * (phase I) and an explicit candidate cut-position list (phase II).
  */
object KSegmentation {

  /** `curve(k-1)` = D(n, k) and `schemes(k-1)` = the optimal k-segmentation,
    * for k = 1..kMax (all collected from one DP run, Section 6). Entries are
    * +∞ / None when no k-segmentation satisfies the max-segment-length
    * constraint (e.g. K = 1 during sketch phase I).
    */
  final case class DPResult(curve: Vector[Double], schemes: Vector[Option[SegScheme]]) {
    def forK(k: Int): (SegScheme, Double) = (schemes(k - 1).get, curve(k - 1))
    /** The feasible prefix-free sub-curve as (k, variance) pairs. */
    def feasible: Vector[(Int, Double)] =
      curve.zipWithIndex.collect { case (v, i) if v.isFinite => (i + 1, v) }
  }

  def dp(
      cost: (Int, Int) => Double,
      positions: Vector[Int],
      kMax: Int,
      maxSegLen: Option[Int] = None,
  ): DPResult = {
    require(positions.size >= 2 && positions == positions.sorted && positions.distinct == positions,
      s"bad candidate positions")
    val p = positions.toArray
    val np = p.length
    val kCap = math.min(kMax, np - 1)
    require(kCap >= 1, "need at least one segment")
    val lenOk: (Int, Int) => Boolean = (i, j) => maxSegLen.forall(l => p(j) - p(i) <= l)

    val inf = Double.PositiveInfinity
    // d(k)(a): min total weighted variance covering [p(0), p(a)] with k segments.
    val d = Array.fill(kCap + 1)(Array.fill(np)(inf))
    val from = Array.fill(kCap + 1)(Array.fill(np)(-1))
    var a = 1
    while (a < np) {
      if (lenOk(0, a)) { d(1)(a) = cost(p(0), p(a)); from(1)(a) = 0 }
      a += 1
    }
    var k = 2
    while (k <= kCap) {
      a = k // need at least k segments worth of positions before p(a)
      while (a < np) {
        var b = k - 1
        var best = inf
        var arg = -1
        while (b < a) {
          if (lenOk(b, a) && d(k - 1)(b) < inf) {
            val v = d(k - 1)(b) + cost(p(b), p(a))
            if (v < best) { best = v; arg = b }
          }
          b += 1
        }
        d(k)(a) = best; from(k)(a) = arg
        a += 1
      }
      k += 1
    }

    val last = np - 1
    val curve = Vector.newBuilder[Double]
    val schemes = Vector.newBuilder[Option[SegScheme]]
    k = 1
    while (k <= kCap) {
      if (d(k)(last) < inf) {
        curve += d(k)(last)
        val cuts = scala.collection.mutable.ArrayBuffer[Int](p(last))
        var kk = k
        var cur = last
        while (kk >= 1) {
          val b = from(kk)(cur)
          cuts += p(b)
          cur = b; kk -= 1
        }
        schemes += Some(SegScheme(cuts.reverse.toVector))
      } else {
        curve += inf
        schemes += None
      }
      k += 1
    }
    DPResult(curve.result(), schemes.result())
  }
}
