package repro.synth

import java.time.{DayOfWeek, LocalDate}
import repro.core._
import scala.util.Random

/** Simulators for the three real-world datasets of Section 7.1.2.
  *
  * The container has no access to the JHU Covid repository, the S&P 500 feed
  * or the Iowa liquor portal, so each dataset is replaced by a synthetic
  * equivalent whose *ground truth evolving contributors are planted to match
  * the paper's published results* (Tables 3-5): per-contributor series are
  * piecewise linear with breakpoints at the paper's reported segment
  * boundaries and slopes chosen so the paper's reported top-3 explanations
  * dominate each segment (verified analytically in DESIGN.md). TSExplain
  * must then re-discover the published segmentation and contributors from
  * the relation alone — exercising every code path the real data would.
  */
object RealWorldSim {

  /** One simulated dataset: enough to build the cube, run the pipeline, and
    * diff the output against the paper's table.
    *
    * @param expected per designed segment, the paper's top-3 as
    *                 (explanation-string, effect) in rank order
    */
  final case class Sim(
      name: String,
      cube: ExplCube,
      truthCuts: Vector[Int],
      expected: Vector[Vector[(String, Int)]],
      records: () => Seq[(Map[String, String], Int, Double)],
  )

  // Simulators are deterministic in their parameters and some are expensive
  // to build (liquor enumerates ~400k records); memoize per parameter set.
  private val memo = new java.util.concurrent.ConcurrentHashMap[String, Sim]()
  private def cached(key: String)(build: => Sim): Sim =
    memo.computeIfAbsent(key, _ => build)

  def dateRange(from: LocalDate, to: LocalDate): Vector[LocalDate] =
    Iterator.iterate(from)(_.plusDays(1)).takeWhile(!_.isAfter(to)).toVector

  def weekdays(from: LocalDate, to: LocalDate): Vector[LocalDate] =
    dateRange(from, to).filter(d =>
      d.getDayOfWeek != DayOfWeek.SATURDAY && d.getDayOfWeek != DayOfWeek.SUNDAY)

  /** Piecewise-linear series through (boundary index, value) anchors with
    * additive Gaussian noise of absolute stddev `sigma`.
    */
  private def pwl(n: Int, anchors: Vector[(Int, Double)], sigma: Double, rnd: Random): Array[Double] = {
    val base = SyntheticGen.piecewiseLinear(n, anchors.map(_._1), anchors.map(_._2))
    if (sigma <= 0) base else base.map(_ + rnd.nextGaussian() * sigma)
  }

  // ----------------------------------------------------------------- Covid

  private val covidDates = dateRange(LocalDate.of(2020, 1, 22), LocalDate.of(2020, 12, 31))

  private def dIdx(dates: Vector[LocalDate], m: Int, d: Int): Int =
    dates.indexOf(LocalDate.of(2020, m, d)) match {
      case -1 => throw new IllegalArgumentException(s"2020-$m-$d not in axis")
      case i  => i
    }

  /** Values of each designed state's daily cases at the 8 boundary dates
    * 1/22, 3/7, 4/7, 5/25, 7/16, 9/9, 11/10, 12/31 — slopes reproduce the
    * rank order of Table 3 in every segment.
    */
  private val covidAnchors: Map[String, Vector[Double]] = Map(
    "Washington"    -> Vector(5, 65, 70, 75, 80, 85, 105, 120),
    "New York"      -> Vector(2, 47, 947, 247, 270, 290, 890, 3390),
    "California"    -> Vector(1, 33, 133, 483, 1283, 783, 1583, 4583),
    "New Jersey"    -> Vector(0, 5, 505, 105, 120, 130, 330, 530),
    "Massachusetts" -> Vector(0, 5, 305, 105, 115, 125, 325, 525),
    "Florida"       -> Vector(0, 10, 60, 110, 1310, 410, 710, 1210),
    "Texas"         -> Vector(0, 10, 60, 110, 1110, 410, 1610, 3110),
    "Illinois"      -> Vector(0, 5, 105, 205, 505, 705, 2205, 205),
    "Wisconsin"     -> Vector(0, 2, 12, 22, 52, 102, 1102, 302),
  )

  private val otherStates: Vector[String] = Vector(
    "Alabama", "Alaska", "Arizona", "Arkansas", "Colorado", "Connecticut", "Delaware",
    "District of Columbia", "Georgia", "Guam", "Hawaii", "Idaho", "Indiana", "Iowa",
    "Kansas", "Kentucky", "Louisiana", "Maine", "Maryland", "Michigan", "Minnesota",
    "Mississippi", "Missouri", "Montana", "Nebraska", "Nevada", "New Hampshire",
    "New Mexico", "North Carolina", "North Dakota", "Ohio", "Oklahoma", "Oregon",
    "Pennsylvania", "Puerto Rico", "Rhode Island", "South Carolina", "South Dakota",
    "Tennessee", "Utah", "Vermont", "Virgin Islands", "Virginia", "West Virginia",
    "Wyoming", "American Samoa", "Northern Mariana Islands", "Minor Outlying Islands",
    "Diamond Princess",
  )

  /** Daily-confirmed-cases (Table 3): 58 states × 345 days. */
  def covidDaily(seed: Long = 42): Sim = cached(s"covid-daily-$seed") {
    val rnd = new Random(seed)
    val dates = covidDates
    val n = dates.size
    val cutsMD = Vector((3, 7), (4, 7), (5, 25), (7, 16), (9, 9), (11, 10))
    val bIdx = 0 +: cutsMD.map { case (m, d) => dIdx(dates, m, d) } :+ (n - 1)
    val sigma = 2.0
    val designed = covidAnchors.toVector.sortBy(_._1).map { case (st, vals) =>
      st -> pwl(n, bIdx.zip(vals), sigma, rnd)
    }
    val background = otherStates.map { st =>
      // small piecewise drift: |Δ| ≤ 10 per designed segment, well below the
      // designed top-3 gap (the smallest designed γ is ~30, segment 1)
      val vals = Vector.iterate(5.0 + rnd.nextDouble() * 10, bIdx.size)(v =>
        math.max(0.0, v + (rnd.nextDouble() * 20 - 10)))
      st -> pwl(n, bIdx.zip(vals), sigma, rnd)
    }
    val all = (designed ++ background).sortBy(_._1)
    val total = new Array[Double](n)
    for ((_, s) <- all; t <- 0 until n) total(t) += s(t)
    val cube = ExplCube.fromSeries(
      Seq("state"), dates.map(_.toString), total,
      all.map { case (st, s) => Expl.of("state" -> st) -> s })
    val expected = Vector(
      Vector(("state=Washington", 1), ("state=New York", 1), ("state=California", 1)),
      Vector(("state=New York", 1), ("state=New Jersey", 1), ("state=Massachusetts", 1)),
      Vector(("state=New York", -1), ("state=New Jersey", -1), ("state=California", 1)),
      Vector(("state=Florida", 1), ("state=Texas", 1), ("state=California", 1)),
      Vector(("state=Florida", -1), ("state=Texas", -1), ("state=California", -1)),
      Vector(("state=Illinois", 1), ("state=Texas", 1), ("state=Wisconsin", 1)),
      Vector(("state=California", 1), ("state=New York", 1), ("state=Illinois", -1)),
    )
    Sim("covid-daily", cube, bIdx.slice(1, bIdx.size - 1), expected,
      () => simRecords(cube))
  }

  /** Total-confirmed-cases: the running sum of the daily sim (Figure 11 /
    * Tables 6-7 rows). No planted expectation — the cumulative structure is
    * derived, and the bench reports what TSExplain finds.
    */
  def covidTotal(seed: Long = 42): Sim = cached(s"covid-total-$seed") {
    val daily = covidDaily(seed)
    def cumsum(s: Array[Double]): Array[Double] = {
      val out = new Array[Double](s.length)
      var acc = 0.0
      for (t <- s.indices) { acc += s(t); out(t) = acc }
      out
    }
    val cube = new ExplCube(
      daily.cube.attrs, daily.cube.times, cumsum(daily.cube.total),
      daily.cube.expls, daily.cube.series.map(cumsum))
    Sim("covid-total", cube, daily.truthCuts, Vector.empty, () => simRecords(cube))
  }

  /** Generic relation emission for single/multi-attribute cubes whose
    * explanations are all order-1 disjoint slices (covid): one record per
    * (slice, t).
    */
  private def simRecords(cube: ExplCube): Seq[(Map[String, String], Int, Double)] =
    for {
      (e, s) <- cube.expls.zip(cube.series.toVector).filter(_._1.order == 1)
      t <- s.indices
    } yield (e.preds.map(p => p.attr -> p.value).toMap, t, s(t))

  // ---------------------------------------------------------------- S&P 500

  /** Category boundary values at 1/2, 2/6, 3/24, 8/25, 10/1 (index units) —
    * reproduces Table 4's rank order in all four segments. consumer_cyclical
    * is split into a designed internet_retail subcategory plus the rest.
    */
  private val spCatAnchors: Vector[(String, Vector[Double])] = Vector(
    "technology"         -> Vector(800, 900, 600, 1100, 950),
    "financial"          -> Vector(400, 410, 210, 260, 190),
    "communication"      -> Vector(300, 310, 160, 360, 260),
    "energy"             -> Vector(150, 70, 30, 50, 40),
    "healthcare"         -> Vector(350, 360, 260, 410, 380),
    "industrials"        -> Vector(250, 255, 205, 280, 270),
    "utilities"          -> Vector(120, 122, 100, 115, 110),
    "consumer_defensive" -> Vector(180, 185, 160, 200, 195),
    "real_estate"        -> Vector(110, 112, 90, 105, 100),
    "basic_materials"    -> Vector(100, 102, 85, 110, 105),
  )
  private val spIrAnchors = Vector[Double](150, 210, 180, 300, 280)      // internet_retail
  private val spCcRestAnchors = Vector[Double](200, 180, 160, 260, 240)  // consumer_cyclical rest

  def sp500(seed: Long = 7): Sim = cached(s"sp500-$seed") {
    val rnd = new Random(seed)
    val dates = weekdays(LocalDate.of(2020, 1, 2), LocalDate.of(2020, 10, 1))
    val n = dates.size
    val bIdx = Vector(0, dIdx(dates, 2, 6), dIdx(dates, 3, 24), dIdx(dates, 8, 25), n - 1)

    // Hierarchy: 11 categories (10 above + consumer_cyclical) × ~9 subcats
    // each (96 total incl. internet_retail) × 503 stocks.
    val catNames = spCatAnchors.map(_._1) :+ "consumer_cyclical"
    val subcatsPerCat: Map[String, Vector[String]] = {
      val base = catNames.zipWithIndex.map { case (c, ci) =>
        val cnt = if (c == "consumer_cyclical") 9 else if (ci < 7) 9 else 8
        c -> Vector.tabulate(cnt)(i =>
          if (c == "consumer_cyclical" && i == 0) "internet_retail" else s"${c}_sub$i")
      }.toMap
      base
    }
    require(subcatsPerCat.values.map(_.size).sum == 96, s"want 96 subcats, got ${subcatsPerCat.values.map(_.size).sum}")

    // Distribute 503 stocks round-robin over the 96 subcategories.
    val allSubcats = catNames.flatMap(c => subcatsPerCat(c).map(s => (c, s)))
    val stocks: Vector[(String, String, String)] =
      (0 until 503).toVector.map { i =>
        val (c, s) = allSubcats(i % allSubcats.size)
        (c, s, f"STK$i%03d")
      }

    // Category (or designed-subcategory) clean series.
    val catSeries: Map[String, Array[Double]] =
      spCatAnchors.map { case (c, v) => c -> pwl(n, bIdx.zip(v), 0.0, rnd) }.toMap
    val irSeries = pwl(n, bIdx.zip(spIrAnchors), 0.0, rnd)
    val ccRestSeries = pwl(n, bIdx.zip(spCcRestAnchors), 0.0, rnd)

    // Subcategory weights within a category are fixed (1..s normalized);
    // stock weights within a subcategory likewise — so every descendant is a
    // constant fraction of its parent and stays below the category γ.
    val sigma = 0.2
    val stockSeries: Vector[((String, String, String), Array[Double])] = stocks.map { case key @ (c, sub, stk) =>
      val subsOfCat = subcatsPerCat(c)
      val catSerie: Array[Double] =
        if (c == "consumer_cyclical") { if (sub == "internet_retail") irSeries else ccRestSeries }
        else catSeries(c)
      val subWeight: Double =
        if (c == "consumer_cyclical") {
          if (sub == "internet_retail") 1.0
          else { val others = subsOfCat.filterNot(_ == "internet_retail"); val i = others.indexOf(sub) + 1.0; i / others.indices.map(_ + 1.0).sum }
        } else { val i = subsOfCat.indexOf(sub) + 1.0; i / subsOfCat.indices.map(_ + 1.0).sum }
      val sibs = stocks.filter(s => s._1 == c && s._2 == sub).map(_._3)
      val wi = sibs.indexOf(stk) + 1.0
      val stockWeight = wi / sibs.indices.map(_ + 1.0).sum
      key -> catSerie.map(_ * subWeight * stockWeight).map(_ + rnd.nextGaussian() * sigma)
    }

    // Build the full conjunction cube from stock-level records: the cascade
    // tree needs conjunction nodes like (category=c & subcategory=s) to reach
    // deeper levels, so functional-dependency duplicates are KEPT here
    // (ε = 503·4 + 96·2 + 11 = 2215); the paper's ε = 610 is the
    // series-identity-deduplicated count, exposed via dedupIdenticalSeries,
    // and outputs are rendered through canonicalExpl.
    val recs: Seq[(Map[String, String], Int, Double)] =
      stockSeries.flatMap { case ((c, sub, stk), s) =>
        s.indices.map(t => (Map("category" -> c, "subcategory" -> sub, "stock" -> stk), t, s(t)))
      }
    val cube = ExplCube.fromRecords(
      Seq("category", "subcategory", "stock"), dates.map(_.toString), recs, maxOrder = 3)

    val expected = Vector(
      Vector(("category=technology", 1), ("category=energy", -1), ("subcategory=internet_retail", 1)),
      Vector(("category=technology", -1), ("category=financial", -1), ("category=communication", -1)),
      Vector(("category=technology", 1), ("category=consumer_cyclical", 1), ("category=communication", 1)),
      Vector(("category=technology", -1), ("category=communication", -1), ("category=financial", -1)),
    )
    Sim("sp500", cube, bIdx.slice(1, bIdx.size - 1), expected, () => recs)
  }

  // ----------------------------------------------------------------- Liquor

  /** (BV, P) cell anchors at 1/2, 1/20, 3/6, 3/31, 4/21, 5/8, 6/10, 6/30 —
    * the marginal sums reproduce the rank order (and the marginal-vs-cell CA
    * choices) of Table 5 in all seven segments; see DESIGN.md.
    */
  private val liquorCells: Vector[((String, String), Vector[Double])] = Vector(
    ("750", "12")  -> Vector(1500, 1200, 1600, 2000, 2350, 2390, 1990, 2340),
    ("1000", "12") -> Vector(800, 600, 800, 450, 700, 950, 1300, 1550),
    ("1750", "12") -> Vector(700, 700, 800, 750, 750, 250, 300, 300),
    ("750", "6")   -> Vector(900, 700, 950, 930, 980, 1180, 1200, 1150),
    ("1750", "6")  -> Vector(600, 500, 650, 1100, 650, 750, 300, 750),
    ("1000", "6")  -> Vector(500, 500, 500, 250, 250, 220, 470, 470),
    ("375", "24")  -> Vector(400, 150, 170, 170, 320, 320, 320, 470),
    ("750", "24")  -> Vector(200, 230, 230, 230, 380, 380, 380, 530),
    ("750", "48")  -> Vector(150, 150, 250, 250, 250, 250, 250, 250),
    ("375", "48")  -> Vector(100, 100, 250, 250, 250, 250, 250, 250),
    ("500", "1")   -> Vector(300, 300, 300, 300, 300, 300, 300, 300),
    ("1125", "2")  -> Vector(150, 150, 150, 150, 150, 150, 150, 150),
    ("250", "4")   -> Vector(100, 100, 100, 100, 100, 100, 100, 100),
    ("3000", "1")  -> Vector(80, 80, 80, 80, 80, 80, 80, 80),
    ("1000", "24") -> Vector(120, 120, 120, 120, 120, 120, 120, 120),
    ("375", "6")   -> Vector(130, 130, 130, 130, 130, 130, 130, 130),
  )

  private val liquorCategories = Vector.tabulate(30)(i => s"CAT_$i")
  private val liquorVendors = Vector.tabulate(60)(i => s"VEND_$i")

  /** Liquor purchases (Table 5): SUM(Bottles_Sold) by day over attributes
    * BV (bottle volume), P (pack), CN (category name), VN (vendor name).
    *
    * Each (BV, P) cell's daily volume is split across a FIXED set of
    * (CN, VN) pairs with fixed weights, sampled once per cell: the CN/VN
    * marginals are then smooth fractions of the designed cell trends (no
    * per-day categorical sampling noise), every CN/VN marginal stays well
    * below the designed top-3 — the paper's observation that TSExplain
    * ignores the uninteresting attributes — and the long tail of small
    * (CN, VN) weights gives the support filter realistic prey (§7.5.1).
    */
  def liquor(seed: Long = 11, pairsPerCell: Int = 180): Sim = cached(s"liquor-$seed-$pairsPerCell") {
    val rnd = new Random(seed)
    val dates = weekdays(LocalDate.of(2020, 1, 2), LocalDate.of(2020, 6, 30))
    val n = dates.size
    val cutsMD = Vector((1, 20), (3, 6), (3, 31), (4, 21), (5, 8), (6, 10))
    val bIdx = 0 +: cutsMD.map { case (m, d) => dIdx(dates, m, d) } :+ (n - 1)
    val sigma = 2.0

    val recs = scala.collection.mutable.ArrayBuffer.empty[(Map[String, String], Int, Double)]
    for (((bv, p), anchors) <- liquorCells) {
      val serie = pwl(n, bIdx.zip(anchors), sigma, rnd)
      // fixed (CN, VN) split for this cell: weights ∝ 1/(rank+6) so the tail
      // pairs fall below the 0.001 support-filter threshold
      val pairs = Vector.tabulate(pairsPerCell) { d =>
        (liquorCategories(rnd.nextInt(liquorCategories.size)),
         liquorVendors(rnd.nextInt(liquorVendors.size)),
         1.0 / (d + 6.0))
      }
      val z = pairs.map(_._3).sum
      for (t <- 0 until n; (cn, vn, w) <- pairs)
        recs += ((Map("BV" -> bv, "P" -> p, "CN" -> cn, "VN" -> vn), t, serie(t) * w / z))
    }
    val recsV = recs.toVector
    val cube = ExplCube.fromRecords(
      Seq("BV", "P", "CN", "VN"), dates.map(_.toString), recsV, maxOrder = 3)

    val expected = Vector(
      Vector(("P=12", -1), ("P=6", -1), ("BV=375 & P=24", -1)),
      Vector(("P=12", 1), ("P=6", 1), ("P=48", 1)),
      Vector(("BV=1000", -1), ("BV=1750 & P=6", 1), ("BV=750 & P=12", 1)),
      Vector(("P=12", 1), ("BV=1750 & P=6", -1), ("P=24", 1)),
      Vector(("BV=1750 & P=12", -1), ("P=6", 1), ("BV=1000 & P=12", 1)),
      Vector(("BV=1000", 1), ("BV=1750 & P=6", -1), ("BV=750 & P=12", -1)),
      Vector(("P=12", 1), ("BV=1750 & P=6", 1), ("P=24", 1)),
    )
    Sim("liquor", cube, bIdx.slice(1, bIdx.size - 1), expected, () => recsV)
  }
}
