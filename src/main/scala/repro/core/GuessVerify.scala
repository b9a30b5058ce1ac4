package repro.core

/** Optimization O1 — guess-and-verify (Section 5.3.1).
  *
  * Instead of feeding all ε candidate explanations to the CA algorithm, run
  * CA on only the m̄ explanations with the highest diff score γ (plus their
  * drill-down ancestors for connectivity), then certify optimality with the
  * Eq. 12 sufficient condition:
  *
  *   Best[m] ≥ Best[m'] + Σ_{1≤j≤m−m'} γ(E_{r_{m̄+j}})   ∀ 0 ≤ m' < m
  *
  * Any true solution splits into explanations ranked ≤ m̄ (its class-1 part
  * is upper-bounded by Best[m'], the restricted CA optimum) and explanations
  * ranked > m̄ (upper-bounded by the next m−m' scores in γ order), so when
  * the condition holds the restricted answer is globally optimal. On failure
  * m̄ doubles (Figure 9); at m̄ ≥ ε the run is the unrestricted CA and
  * trivially optimal. Results therefore always match the vanilla CA's score.
  */
final class GuessVerify(val cube: ExplCube, val m: Int, val maxOrder: Int = 3, m0: Int = -1) {
  private val initialMBar = if (m0 > 0) m0 else 10 * m
  private val eps = cube.epsilon

  /** Number of CA invocations performed (for latency accounting). */
  var caRuns: Long = 0L
  /** Largest m̄ any segment needed (diagnostics). */
  var maxMBarUsed: Int = 0

  private val fullCA = new CascadingAnalysts(cube, m, maxOrder)
  private val gammas = new Array[Double](eps)

  /** Top-`k` explanation ids by γ, descending — bounded min-heap selection
    * so a segment costs O(ε log k), not a full ε log ε sort.
    */
  private def topByGamma(k: Int): Array[Int] = {
    val cap = math.min(k, eps)
    val hg = new Array[Double](cap) // heap of gammas (min-heap)
    val hi = new Array[Int](cap)
    var size = 0
    def siftUp(c0: Int): Unit = {
      var c = c0
      while (c > 0 && hg((c - 1) / 2) > hg(c)) {
        val p = (c - 1) / 2
        val tg = hg(p); hg(p) = hg(c); hg(c) = tg
        val ti = hi(p); hi(p) = hi(c); hi(c) = ti
        c = p
      }
    }
    def siftDown(): Unit = {
      var c = 0
      var done = false
      while (!done) {
        val l = 2 * c + 1; val r = 2 * c + 2
        var s = c
        if (l < size && hg(l) < hg(s)) s = l
        if (r < size && hg(r) < hg(s)) s = r
        if (s == c) done = true
        else {
          val tg = hg(s); hg(s) = hg(c); hg(c) = tg
          val ti = hi(s); hi(s) = hi(c); hi(c) = ti
          c = s
        }
      }
    }
    var id = 0
    while (id < eps) {
      val g = gammas(id)
      if (size < cap) { hg(size) = g; hi(size) = id; size += 1; siftUp(size - 1) }
      else if (g > hg(0)) { hg(0) = g; hi(0) = id; siftDown() }
      id += 1
    }
    // extract ascending, reverse to descending
    val out = new Array[Int](size)
    var s = size
    while (s > 0) {
      out(s - 1) = hi(0)
      s -= 1
      hg(0) = hg(s); hi(0) = hi(s); size = s
      siftDown()
    }
    out.sortBy(i => -gammas(i)) // heap extraction already sorts; keep as safety for ties
  }

  /** Restricted cube over `activeIds` ∪ their in-cube ancestors; returns the
    * sub-cube plus the mapping from sub-cube ids back to original ids.
    */
  private def subCube(activeIds: Array[Int]): (ExplCube, Array[Int]) = {
    val keep = scala.collection.mutable.SortedSet.empty[Int]
    activeIds.foreach(keep += _)
    for (id <- activeIds; anc <- cube.expls(id).ancestors if anc.order > 0)
      if (cube.contains(anc)) keep += cube.idOf(anc)
    val ids = keep.toArray
    val sub = new ExplCube(cube.attrs, cube.times, cube.total,
      ids.toVector.map(cube.expls), ids.map(cube.series))
    (sub, ids)
  }

  // With few candidates the guess cannot pay for its per-segment set-up
  // (sub-cube build + fresh memo); delegate to the shared memoized CA.
  // An explicit m0 (tests) disables the short-circuit.
  private val shortCircuit = m0 <= 0 && eps <= math.max(200, 4 * initialMBar)

  /** Top-m via guess-and-verify; equal (in score) to the vanilla CA. */
  def topIds(seg: Segment): TopIds = {
    if (shortCircuit) {
      caRuns += 1
      maxMBarUsed = math.max(maxMBarUsed, eps)
      return fullCA.topIds(seg)
    }
    var id = 0
    while (id < eps) { gammas(id) = cube.gamma(id, seg); id += 1 }
    var mBar = math.min(initialMBar, eps)
    while (true) {
      if (mBar >= eps) {
        caRuns += 1
        maxMBarUsed = math.max(maxMBarUsed, eps)
        return fullCA.topIds(seg)
      }
      val order = topByGamma(mBar + m) // m̄ actives + the certificate tail
      val (sub, back) = subCube(order.take(mBar))
      caRuns += 1
      val res = new CascadingAnalysts(sub, m, maxOrder).topIds(seg)
      // Eq. 12 certificate over the γ-sorted tail beyond rank m̄.
      var ok = true
      var tailSum = 0.0
      var mp = m - 1
      while (mp >= 0 && ok) {
        val tailRank = mBar + (m - 1 - mp)
        tailSum += (if (tailRank < order.length) gammas(order(tailRank)) else 0.0)
        if (res.best(m) + 1e-9 < res.best(mp) + tailSum) ok = false
        mp -= 1
      }
      if (ok) {
        maxMBarUsed = math.max(maxMBarUsed, mBar)
        return TopIds(res.ids.map(back), res.gammas, res.taus, res.best)
      }
      mBar = math.min(mBar * 2, eps)
    }
    throw new IllegalStateException("unreachable")
  }
}
