package repro.core

/** The Cascading Analysts algorithm (Ruhl, Sundararajan, Yan [38]) — top-m
  * non-overlapping explanations for one segment (Section 5.2, module b).
  *
  * The algorithm simulates an analyst who, starting from the whole data,
  * either *selects* the current slice as an explanation (closing its subtree,
  * which guarantees non-overlap with any refinement) or *drills down* on one
  * not-yet-constrained attribute, partitioning the slice by that attribute's
  * values and distributing the remaining quota among the children (siblings
  * differ on the drilled attribute, hence are non-overlapping). Both the
  * drill-down dimension choice and the quota split are optimized by dynamic
  * programming to maximize Σ γ(E) under |selections| ≤ m.
  *
  * `solve` memoizes the per-context score vector Best_ctx[0..m]; the memo is
  * reused across segments via version stamps, so one instance amortizes its
  * allocations over the O(n²) segments of the pipeline. Instances are NOT
  * thread-safe — create one per thread/task.
  *
  * @param cube     explanation cube with γ/τ lookups and drill-down adjacency
  * @param m        explanation quota (paper default 3)
  * @param maxOrder order threshold β̄ (paper default 3)
  */
final class CascadingAnalysts(val cube: ExplCube, val m: Int, val maxOrder: Int = 3) {
  require(m >= 1, "m must be positive")

  private val eps = cube.epsilon
  // memo(id + 1)(q) = best score of subtree rooted at context id with quota q;
  // id -1 is the virtual root (empty conjunction, not selectable).
  private val memo = Array.fill(eps + 1)(new Array[Double](m + 1))
  private val stamp = new Array[Int](eps + 1)
  private var version = 0
  private var seg: Segment = _

  private def solve(id: Int): Array[Double] = {
    val slot = id + 1
    if (stamp(slot) == version) return memo(slot)
    val out = memo(slot)
    java.util.Arrays.fill(out, 0.0)
    val order = if (id < 0) 0 else cube.expls(id).order
    // Option 1: select this slice — worth γ, closes the subtree.
    if (id >= 0) {
      val g = cube.gamma(id, seg)
      var q = 1
      while (q <= m) { if (g > out(q)) out(q) = g; q += 1 }
    }
    // Option 2: drill down on one remaining attribute; knapsack the quota
    // over that attribute's children.
    if (order < maxOrder) {
      cube.children.get(id).foreach { byAttr =>
        byAttr.foreach { case (_, childIds) =>
          val cur = new Array[Double](m + 1)
          var ci = 0
          while (ci < childIds.length) {
            val child = solve(childIds(ci))
            var q = m
            while (q >= 1) {
              var w = 1
              var best = cur(q)
              while (w <= q) {
                val v = cur(q - w) + child(w)
                if (v > best) best = v
                w += 1
              }
              cur(q) = best
              q -= 1
            }
            ci += 1
          }
          var q = 1
          while (q <= m) { if (cur(q) > out(q)) out(q) = cur(q); q += 1 }
        }
      }
    }
    // At-most semantics: scores are nondecreasing in q.
    var q = 1
    while (q <= m) { if (out(q - 1) > out(q)) out(q) = out(q - 1); q += 1 }
    stamp(slot) = version
    out
  }

  /** Re-walks the solved DP making argmax decisions to recover the selected
    * explanation ids (scores are already memoized, so this is cheap).
    */
  private def backtrack(id: Int, q: Int, out: scala.collection.mutable.ArrayBuffer[Int]): Unit = {
    if (q == 0) return
    val target = solve(id)(q)
    if (target <= 0.0) return
    if (solve(id)(q - 1) == target) { backtrack(id, q - 1, out); return }
    if (id >= 0 && cube.gamma(id, seg) == target) { out += id; return }
    val order = if (id < 0) 0 else cube.expls(id).order
    if (order < maxOrder) {
      for (byAttr <- cube.children.get(id); (_, childIds) <- byAttr) {
        // Recompute this attribute's knapsack with backtrack pointers.
        val rows = Array.fill(childIds.length + 1)(new Array[Double](q + 1))
        val take = Array.fill(childIds.length + 1)(new Array[Int](q + 1))
        var ci = 0
        while (ci < childIds.length) {
          val child = solve(childIds(ci))
          var w = 0
          while (w <= q) {
            var best = rows(ci)(w); var bw = 0
            var u = 1
            while (u <= w) {
              val v = rows(ci)(w - u) + child(u)
              if (v > best) { best = v; bw = u }
              u += 1
            }
            rows(ci + 1)(w) = best; take(ci + 1)(w) = bw
            w += 1
          }
          ci += 1
        }
        if (rows(childIds.length)(q) == target) {
          var w = q; ci = childIds.length
          while (ci > 0) {
            val u = take(ci)(w)
            if (u > 0) backtrack(childIds(ci - 1), u, out)
            w -= u; ci -= 1
          }
          return
        }
      }
    }
    throw new IllegalStateException(s"backtrack failed at ctx=$id q=$q target=$target")
  }

  /** Top-m non-overlapping explanations of `segment` as compact ids ranked by
    * γ descending, with the Best[0..m] score vector (Definition 3.5 / Eq. 12).
    */
  def topIds(segment: Segment): TopIds = {
    seg = segment
    version += 1
    val best = solve(-1).clone()
    val sel = scala.collection.mutable.ArrayBuffer.empty[Int]
    backtrack(-1, m, sel)
    val ranked = sel.toArray.sortBy(id => (-cube.gamma(id, segment), cube.expls(id).toString))
    TopIds(
      ranked,
      ranked.map(cube.gamma(_, segment)),
      ranked.map(cube.tau(_, segment)),
      best,
    )
  }

  /** Presentation form of [[topIds]]. */
  def topExpl(segment: Segment): TopExpl = CascadingAnalysts.pretty(cube, topIds(segment))
}

object CascadingAnalysts {
  def pretty(cube: ExplCube, t: TopIds): TopExpl =
    TopExpl(
      t.ids.indices.map(r => RankedExpl(cube.expls(t.ids(r)), t.gammas(r), t.taus(r))).toVector,
      t.best.toVector,
    )
}

/** Exponential-time reference implementation of the same cascading search
  * space — no memoization, direct recursive enumeration of (select | drill ×
  * quota split). Used only by tests to validate the DP.
  */
object CascadingAnalystsBrute {
  def topExpl(cube: ExplCube, seg: Segment, m: Int, maxOrder: Int = 3): (Double, Set[Expl]) = {
    def go(id: Int, q: Int): (Double, Set[Expl]) = {
      if (q == 0) return (0.0, Set.empty)
      var best: (Double, Set[Expl]) = (0.0, Set.empty)
      if (id >= 0) {
        val g = cube.gamma(id, seg)
        if (g > best._1) best = (g, Set(cube.expls(id)))
      }
      val order = if (id < 0) 0 else cube.expls(id).order
      if (order < maxOrder) {
        for (byAttr <- cube.children.get(id).toSeq; (_, childIds) <- byAttr) {
          // enumerate all quota assignments to children
          def assign(idx: Int, left: Int): (Double, Set[Expl]) =
            if (idx == childIds.length || left == 0) (0.0, Set.empty)
            else {
              var acc: (Double, Set[Expl]) = assign(idx + 1, left)
              var w = 1
              while (w <= left) {
                val (s1, e1) = go(childIds(idx), w)
                val (s2, e2) = assign(idx + 1, left - w)
                if (s1 + s2 > acc._1) acc = (s1 + s2, e1 ++ e2)
                w += 1
              }
              acc
            }
          val cand = assign(0, q)
          if (cand._1 > best._1) best = cand
        }
      }
      best
    }
    go(-1, m)
  }
}
