package repro.core

/** In-memory explanation cube: the aggregated time series of every candidate
  * explanation plus the overall series (Section 5.2, module a).
  *
  * For a decomposable aggregate f = SUM, the absolute-change of Definition
  * 3.2 over a segment [t_i, t_j] collapses to an O(1) lookup on E's own
  * series: γ(E) = |s_E(j) − s_E(i)| and τ(E) = sign(s_E(j) − s_E(i)),
  * because removing σ_E R from both endpoint relations shifts each endpoint
  * aggregate by exactly s_E(t).
  *
  * @param attrs   explain-by attribute names (drill-down dimensions)
  * @param times   ordered time axis labels (for presentation only)
  * @param total   overall aggregated series, length n
  * @param expls   candidate explanations, index-aligned with `series`
  * @param series  per-explanation aggregated series, each of length n
  */
final class ExplCube(
    val attrs: Vector[String],
    val times: Vector[String],
    val total: Array[Double],
    val expls: Vector[Expl],
    val series: Array[Array[Double]],
) extends Serializable {
  require(series.length == expls.size, "expls/series misaligned")
  require(series.forall(_.length == total.length), "ragged series")

  /** Number of points n in the aggregated time series. */
  def n: Int = total.length

  /** Number of candidate explanations ε. */
  def epsilon: Int = expls.size

  private val index: Map[Expl, Int] = expls.zipWithIndex.toMap

  def idOf(e: Expl): Int = index(e)
  def contains(e: Expl): Boolean = index.contains(e)

  /** Diff score γ(E, [i,j]) (Definition 3.2, absolute-change, f = SUM). */
  def gamma(explId: Int, seg: Segment): Double =
    math.abs(series(explId)(seg.j) - series(explId)(seg.i))

  /** Change effect τ(E, [i,j]) (Definition 3.3): +1 increase, -1 decrease. */
  def tau(explId: Int, seg: Segment): Int =
    math.signum(series(explId)(seg.j) - series(explId)(seg.i)).toInt

  /** Drill-down adjacency: children(parentId or -1 for root)(attr) = child
    * explanation ids extending the parent with one predicate on `attr`.
    * Only extensions present in the cube (i.e. with data) appear.
    */
  lazy val children: Map[Int, Map[String, Array[Int]]] = {
    val buf = scala.collection.mutable.Map.empty[Int, scala.collection.mutable.Map[String, scala.collection.mutable.ArrayBuffer[Int]]]
    for ((e, id) <- expls.zipWithIndex; p <- e.preds) {
      val parent = e.without(p.attr)
      val pid = if (parent.order == 0) -1 else index.getOrElse(parent, Int.MinValue)
      if (pid != Int.MinValue) {
        val byAttr = buf.getOrElseUpdate(pid, scala.collection.mutable.Map.empty)
        byAttr.getOrElseUpdate(p.attr, new scala.collection.mutable.ArrayBuffer[Int]) += id
      }
    }
    buf.iterator.map { case (pid, m) => pid -> m.iterator.map { case (a, b) => a -> b.toArray }.toMap }.toMap
  }

  /** Support filter (§7.5.1): drop E when every point of its series is below
    * `ratio` of the overall series (absolute values). Returns a new cube.
    */
  def filtered(ratio: Double): ExplCube = {
    val keep = expls.indices.filter { id =>
      val s = series(id)
      var t = 0
      var significant = false
      while (t < n && !significant) {
        if (math.abs(s(t)) >= ratio * math.abs(total(t))) significant = true
        t += 1
      }
      significant
    }
    // Keep closure under sub-conjunctions so drill-down paths stay intact:
    // a surviving order-3 explanation must remain reachable through its
    // order-1/2 ancestors even if those happen to be individually small
    // (cannot occur for SUM of non-negatives, but can for signed measures).
    val keepSet = scala.collection.mutable.Set[Int](keep: _*)
    var changed = true
    while (changed) {
      changed = false
      for (id <- keepSet.toVector; p <- expls(id).preds) {
        val parent = expls(id).without(p.attr)
        if (parent.order > 0) index.get(parent).foreach { pid =>
          if (!keepSet.contains(pid)) { keepSet += pid; changed = true }
        }
      }
    }
    val ids = expls.indices.filter(keepSet.contains).toVector
    new ExplCube(attrs, times, total, ids.map(expls), ids.map(series).toArray)
  }

  /** Deduplicate explanations whose series are identical (hierarchy
    * functional dependencies make e.g. `subcategory=x` and
    * `category=c & subcategory=x` cover the same records); keeps the
    * lowest-order, lexicographically-smallest representative.
    */
  def dedupIdenticalSeries: ExplCube = {
    val byKey = scala.collection.mutable.LinkedHashMap.empty[Seq[Double], Int]
    for (id <- expls.indices) {
      val key: Seq[Double] = series(id).toSeq
      byKey.get(key) match {
        case None => byKey(key) = id
        case Some(prev) =>
          val a = expls(prev); val b = expls(id)
          val ord = Ordering.Tuple2[Int, String]
          if (ord.lt((b.order, b.toString), (a.order, a.toString))) byKey(key) = id
      }
    }
    val ids = byKey.values.toVector.sorted
    new ExplCube(attrs, times, total, ids.map(expls), ids.map(series).toArray)
  }

  /** Canonical (minimal) equivalent of each explanation: when a hierarchy
    * functional dependency makes several conjunctions cover exactly the same
    * records (bitwise-identical series, guaranteed by the deterministic
    * accumulation order of the builders), the lowest-order lexicographically
    * smallest one is the canonical presentation form — e.g.
    * `category=cc & subcategory=internet_retail` renders as
    * `subcategory=internet_retail` (§7.1.2, S&P 500 hierarchy).
    */
  lazy val canonicalExpl: Vector[Expl] = {
    val byKey = scala.collection.mutable.HashMap.empty[Seq[Double], Int]
    val ord = Ordering.Tuple2[Int, String]
    for (id <- expls.indices) {
      val key: Seq[Double] = series(id).toSeq
      byKey.get(key) match {
        case None => byKey(key) = id
        case Some(prev) =>
          val a = expls(prev); val b = expls(id)
          if (ord.lt((b.order, b.toString), (a.order, a.toString))) byKey(key) = id
      }
    }
    Vector.tabulate(expls.size)(id => expls(byKey(series(id).toSeq)))
  }

  /** Centered moving average of window `w` applied to every series (the
    * paper smooths very fuzzy datasets before explaining, §7.4); window is
    * truncated at the edges so the series length is preserved.
    */
  def smoothed(w: Int): ExplCube = {
    require(w >= 1, "window must be positive")
    def sm(s: Array[Double]): Array[Double] = {
      val half = w / 2
      Array.tabulate(s.length) { t =>
        val lo = math.max(0, t - half)
        val hi = math.min(s.length - 1, t + half)
        var acc = 0.0
        var i = lo
        while (i <= hi) { acc += s(i); i += 1 }
        acc / (hi - lo + 1)
      }
    }
    new ExplCube(attrs, times, sm(total), expls, series.map(sm))
  }

  /** Restrict to the time index range [from, to] (both inclusive). */
  def slice(from: Int, to: Int): ExplCube = {
    require(0 <= from && from < to && to < n, s"bad slice [$from,$to]")
    new ExplCube(
      attrs,
      times.slice(from, to + 1),
      total.slice(from, to + 1),
      expls,
      series.map(_.slice(from, to + 1)),
    )
  }
}

object ExplCube {

  /** Build a cube directly from per-explanation series (driver-side path used
    * by tests and the synthetic generators; the Spark path lives in
    * [[repro.cube.ExplanationCube]]).
    */
  def fromSeries(
      attrs: Seq[String],
      times: Seq[String],
      total: Array[Double],
      perExpl: Seq[(Expl, Array[Double])],
  ): ExplCube = {
    val sorted = perExpl.sortBy { case (e, _) => (e.order, e.toString) }
    new ExplCube(attrs.toVector, times.toVector, total, sorted.map(_._1).toVector, sorted.map(_._2).toArray)
  }

  /** Build from raw records (attrValues per explain-by attr, time index,
    * measure); enumerates every conjunction up to `maxOrder` present in the
    * data and SUM-aggregates each one's series. Reference implementation —
    * quadratic-ish, meant for tests and small data.
    */
  def fromRecords(
      attrs: Seq[String],
      times: Seq[String],
      records: Seq[(Map[String, String], Int, Double)],
      maxOrder: Int = 3,
  ): ExplCube = {
    val n = times.size
    val total = new Array[Double](n)
    val acc = scala.collection.mutable.Map.empty[Expl, Array[Double]]
    for ((attrVals, t, m) <- records) {
      require(0 <= t && t < n, s"time index $t out of range")
      total(t) += m
      val present = attrs.filter(attrVals.contains).toVector
      for (k <- 1 to math.min(maxOrder, present.size); combo <- present.combinations(k)) {
        val e = Expl.of(combo.map(a => a -> attrVals(a)): _*)
        val s = acc.getOrElseUpdate(e, new Array[Double](n))
        s(t) += m
      }
    }
    fromSeries(attrs, times, total, acc.toSeq)
  }
}
