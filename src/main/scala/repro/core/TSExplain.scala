package repro.core

/** Pipeline configuration (paper defaults: m = 3, β̄ = 3, K ≤ 20, tse). */
final case class TSConfig(
    m: Int = 3,
    maxOrder: Int = 3,
    metric: VarianceMetric = VarianceMetric.Tse,
    kMax: Int = 20,
    fixedK: Option[Int] = None,
    filterRatio: Option[Double] = None,
    guessVerify: Boolean = false,
    sketch: Boolean = false,
    smoothWindow: Option[Int] = None,
) {
  def withAllOpts: TSConfig = copy(guessVerify = true, sketch = true)
}

/** Wall-clock breakdown matching Figure 15's three pipeline modules. */
final case class Timings(precomputeMs: Double, caMs: Double, ksegMs: Double) {
  def totalMs: Double = precomputeMs + caMs + ksegMs
}

/** The TSExplain pipeline (Figure 7): precompute (filter/smooth the cube) →
  * per-segment Cascading Analysts → K-Segmentation DP → elbow K → evolving
  * explanations. Optimizations O1 (guess-and-verify) and O2 (sketching) plug
  * into the CA stage and the candidate cut positions respectively.
  */
object TSExplain {

  final case class Result(
      explanation: Explanation,
      timings: Timings,
      cube: ExplCube,
      costs: SegmentCosts,
      candidates: Vector[Int],
  )

  def explain(cube0: ExplCube, cfg: TSConfig): Result = {
    val t0 = System.nanoTime()
    var cube = cfg.smoothWindow.fold(cube0)(cube0.smoothed)
    cube = cfg.filterRatio.fold(cube)(cube.filtered)
    val precomputeMs = (System.nanoTime() - t0) / 1e6

    // Per-segment top-explanation provider with caching; CA time is
    // accumulated across all (lazy) invocations for the Fig. 15 breakdown.
    var caNanos = 0L
    val solver: Segment => TopIds =
      if (cfg.guessVerify) {
        val gv = new GuessVerify(cube, cfg.m, cfg.maxOrder)
        gv.topIds _
      } else {
        val ca = new CascadingAnalysts(cube, cfg.m, cfg.maxOrder)
        ca.topIds _
      }
    val topCache = new java.util.HashMap[Long, TopIds]()
    val topFn: Segment => TopIds = { seg =>
      val key = (seg.i.toLong << 32) | seg.j.toLong
      val hit = topCache.get(key)
      if (hit != null) hit
      else {
        val s = System.nanoTime()
        val r = solver(seg)
        caNanos += System.nanoTime() - s
        topCache.put(key, r)
        r
      }
    }

    val costs = new SegmentCosts(cube, cfg.metric, topFn)
    val t1 = System.nanoTime()
    val candidates: Vector[Int] =
      if (cfg.sketch) Sketch.select(costs) else (0 until cube.n).toVector
    val kCap = math.min(cfg.kMax, candidates.size - 1)
    val dpRes = KSegmentation.dp(costs.cost, candidates, kCap)
    val curve = dpRes.curve
    val k = cfg.fixedK.map(k0 => math.max(1, math.min(k0, kCap))).getOrElse(Elbow.select(curve))
    val scheme = dpRes.schemes(k - 1).get
    val perSegment = scheme.segments.map(s => s -> CascadingAnalysts.pretty(cube, topFn(s)))
    val stageNanos = System.nanoTime() - t1
    val caMs = caNanos / 1e6
    val ksegMs = math.max(0.0, stageNanos / 1e6 - caMs)

    Result(
      Explanation(scheme, curve(k - 1), perSegment, curve.zipWithIndex.map { case (v, i) => (i + 1, v) }),
      Timings(precomputeMs, caMs, ksegMs),
      cube,
      costs,
      candidates,
    )
  }

  /** Render an explanation as the paper's per-segment table (Tables 3-5). */
  def render(cube: ExplCube, e: Explanation): String = {
    val sb = new StringBuilder
    sb ++= f"K=${e.scheme.k} totalVariance=${e.totalVariance}%.4f\n"
    sb ++= "Segment | Top-1 Expl | Top-2 Expl | Top-3 Expl\n"
    for ((seg, top) <- e.perSegment) {
      val cells = top.ranked.map(r => s"${r.expl} ${if (r.tau >= 0) "+" else "-"}")
      sb ++= s"${cube.times(seg.i)} ~ ${cube.times(seg.j)} | ${cells.padTo(3, "—").mkString(" | ")}\n"
    }
    sb.result()
  }
}
