package repro.cube

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import repro.core._

/** Spark orchestration of the TSExplain pipeline.
  *
  * Two distributed paths:
  *   1. [[topIdsPerSegment]] fans the O(n²) per-segment Cascading Analysts
  *      stage (the pipeline bottleneck, §5.2) out over executors with the
  *      explanation cube broadcast once; the sequential K-Segmentation DP
  *      then runs on the driver over the collected top lists.
  *   2. [[explainGrouped]] treats the whole pipeline as a custom
  *      dynamic-programming function applied per *grouped time series*
  *      (`groupByKey(seriesId).mapGroups`), so a fleet of independent series
  *      (e.g. the 140 synthetic datasets of §7.1.1) is explained in parallel.
  */
object SparkTSExplain {

  /** Distributed module (b): top-m per segment with the cube broadcast. */
  def topIdsPerSegment(
      spark: SparkSession,
      cube: ExplCube,
      segments: Seq[Segment],
      cfg: TSConfig,
  ): Map[(Int, Int), TopIds] = {
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(cube)
    val m = cfg.m; val maxOrder = cfg.maxOrder; val gv = cfg.guessVerify
    spark
      .createDataset(segments.map(s => (s.i, s.j)))
      .repartition(math.max(1, math.min(64, segments.size / 64)))
      .mapPartitions { it =>
        val c = bc.value
        val solver: Segment => TopIds =
          if (gv) new GuessVerify(c, m, maxOrder).topIds _
          else new CascadingAnalysts(c, m, maxOrder).topIds _
        it.map { case (i, j) =>
          val t = solver(Segment(i, j))
          (i, j, t.ids, t.gammas, t.taus, t.best)
        }
      }
      .collect()
      .map { case (i, j, ids, gs, ts, best) => (i, j) -> TopIds(ids, gs, ts, best) }
      .toMap
  }

  /** Full explain with the CA stage distributed (no-sketch configurations):
    * precompute all unit + candidate-segment top lists on executors, then run
    * SegmentCosts + DP + elbow on the driver. Result is identical to the
    * driver-only [[TSExplain.explain]] — tests assert the parity.
    */
  def explainDistributed(spark: SparkSession, cube0: ExplCube, cfg: TSConfig): Explanation = {
    require(!cfg.sketch, "distributed path covers non-sketch configs; use TSExplain.explain for O2")
    var cube = cfg.smoothWindow.fold(cube0)(cube0.smoothed)
    cube = cfg.filterRatio.fold(cube)(cube.filtered)
    val n = cube.n
    val segments =
      (for { i <- 0 until n; j <- i + 1 until n } yield Segment(i, j)).toVector
    val tops = topIdsPerSegment(spark, cube, segments, cfg)
    val topFn: Segment => TopIds = s => tops((s.i, s.j))
    val costs = new SegmentCosts(cube, cfg.metric, topFn)
    val kCap = math.min(cfg.kMax, n - 1)
    val dpRes = KSegmentation.dp(costs.cost, (0 until n).toVector, kCap)
    val k = cfg.fixedK.map(k0 => math.max(1, math.min(k0, kCap))).getOrElse(Elbow.select(dpRes.curve))
    val scheme = dpRes.schemes(k - 1).get
    Explanation(
      scheme,
      dpRes.curve(k - 1),
      scheme.segments.map(s => s -> CascadingAnalysts.pretty(cube, topFn(s))),
      dpRes.curve.zipWithIndex.map { case (v, i) => (i + 1, v) },
    )
  }

  /** One row of a many-series relation: (seriesId, timeIndex, category, m). */
  type SeriesRow = (String, Int, String, Double)

  /** One explained series: (seriesId, K, interiorCuts, totalVariance). */
  type GroupedResult = (String, Int, Seq[Int], Double)

  /** The whole TSExplain pipeline as a DP over grouped time series: group the
    * relation by series id and run cube-building + CA + K-Segmentation DP +
    * elbow inside `mapGroups` on executors, one task per series.
    */
  def explainGrouped(
      spark: SparkSession,
      rows: Dataset[SeriesRow],
      cfg: TSConfig,
      attr: String = "category",
  ): Dataset[GroupedResult] = {
    import spark.implicits._
    rows
      .groupByKey(_._1)
      .mapGroups { (sid, it) =>
        val recs = it.toVector
        val n = recs.iterator.map(_._2).max + 1
        val cube = ExplCube.fromRecords(
          Seq(attr),
          (0 until n).map(_.toString),
          recs.map { case (_, t, c, m) => (Map(attr -> c), t, m) },
          cfg.maxOrder,
        )
        val res = TSExplain.explain(cube, cfg)
        (sid, res.explanation.scheme.k, res.explanation.scheme.interior, res.explanation.totalVariance)
      }
  }
}
