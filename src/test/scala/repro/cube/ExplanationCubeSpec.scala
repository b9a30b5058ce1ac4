package repro.cube

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.core._
import repro.synth.{RealWorldSim, SyntheticGen}

class ExplanationCubeSpec extends SparkSpec {

  lazy val synthDs = SyntheticGen.generate(n = 25, snrDb = 40, seed = 77)
  lazy val synthDf: DataFrame = SynthData.synthetic(spark, synthDs).cache()

  // --------------------------------------------------- cubeDF vs the oracle

  test("cubeDF total series matches DuckDB GROUP BY t") {
    val cube = ExplanationCube.cubeDF(synthDf, "t", Seq("category"), "m")
    val totals = cube.where(col("gid") =!= 0).select(col("t"), col("agg_value").as("s"))
    Oracle.assertEquivalent(
      totals,
      "SELECT t, SUM(CAST(m AS DOUBLE)) AS s FROM r GROUP BY t",
      "r" -> synthDf)
  }

  test("cubeDF per-category series matches DuckDB GROUP BY t, category") {
    val cube = ExplanationCube.cubeDF(synthDf, "t", Seq("category"), "m")
    val slices = cube.where(col("gid") === 0).select(col("t"), col("category"), col("agg_value").as("s"))
    Oracle.assertEquivalent(
      slices,
      "SELECT t, category, SUM(CAST(m AS DOUBLE)) AS s FROM r GROUP BY t, category",
      "r" -> synthDf)
  }

  test("cubeDF order-2 slices on a 2-attribute relation match DuckDB") {
    val sim = RealWorldSim.liquor(pairsPerCell = 3)
    val df = SynthData.explainRelation(spark, Seq("BV", "P", "CN", "VN"),
      sim.records().filter(_._2 < 20)).cache()
    val cube = ExplanationCube.cubeDF(df, "t", Seq("BV", "P"), "m", maxOrder = 2)
    // gid layout for (t, BV, P): BV bit = 2, P bit = 1; gid==0 → both concrete
    val cells = cube.where(col("gid") === 0).select(col("t"), col("BV"), col("P"), col("agg_value").as("s"))
    Oracle.assertEquivalent(
      cells,
      "SELECT t, BV, P, SUM(CAST(m AS DOUBLE)) AS s FROM r GROUP BY t, BV, P",
      "r" -> df.select("BV", "P", "t", "m"))
    val bvOnly = cube.where(col("gid") === 1).select(col("t"), col("BV"), col("agg_value").as("s"))
    Oracle.assertEquivalent(
      bvOnly,
      "SELECT t, BV, SUM(CAST(m AS DOUBLE)) AS s FROM r GROUP BY t, BV",
      "r" -> df.select("BV", "t", "m"))
  }

  test("cubeDF drops rows that aggregate away the time dimension") {
    val cube = ExplanationCube.cubeDF(synthDf, "t", Seq("category"), "m")
    assert(cube.where(col("t").isNull).count() == 0)
  }

  test("cubeDF maxOrder filter drops deep conjunctions") {
    val sim = RealWorldSim.liquor(pairsPerCell = 2)
    val df = SynthData.explainRelation(spark, Seq("BV", "P", "CN", "VN"),
      sim.records().filter(_._2 < 10))
    val c1 = ExplanationCube.cubeDF(df, "t", Seq("BV", "P", "CN", "VN"), "m", maxOrder = 1)
    // with maxOrder=1 every kept row has ≤ 1 concrete attribute
    val bad = c1.where(
      (when(col("BV").isNotNull, 1).otherwise(0) +
        when(col("P").isNotNull, 1).otherwise(0) +
        when(col("CN").isNotNull, 1).otherwise(0) +
        when(col("VN").isNotNull, 1).otherwise(0)) > 1)
    assert(bad.count() == 0)
  }

  // ------------------------------------------------ build vs the core cube

  test("Spark-built cube equals the driver-built cube on the synthetic dataset") {
    val sparkCube = ExplanationCube.build(synthDf, "t", Seq("category"), "m")
    val coreCube = ExplCube.fromRecords(
      Seq("category"), (0 until synthDs.cube.n).map(_.toString), SyntheticGen.records(synthDs))
    assert(sparkCube.epsilon == coreCube.epsilon)
    assert(sparkCube.expls.toSet == coreCube.expls.toSet)
    for (e <- coreCube.expls) {
      val a = sparkCube.series(sparkCube.idOf(e))
      val b = coreCube.series(coreCube.idOf(e))
      assert(a.zip(b).forall { case (x, y) => math.abs(x - y) < 1e-6 }, s"series of $e")
    }
    assert(sparkCube.total.zip(coreCube.total).forall { case (x, y) => math.abs(x - y) < 1e-6 })
  }

  test("Spark-built cube time axis is sorted by the time column") {
    val sparkCube = ExplanationCube.build(synthDf, "t", Seq("category"), "m")
    assert(sparkCube.times == sparkCube.times.sortBy(_.toInt).map(_.toString))
  }

  test("Spark-built multi-attribute cube equals the core cube (liquor sample)") {
    val sim = RealWorldSim.liquor(pairsPerCell = 2)
    val recs = sim.records().filter(_._2 < 15)
    val df = SynthData.explainRelation(spark, Seq("BV", "P", "CN", "VN"), recs)
    val sparkCube = ExplanationCube.build(df, "t", Seq("BV", "P", "CN", "VN"), "m", maxOrder = 3)
    val times = (0 until 15).map(_.toString)
    val coreCube = ExplCube.fromRecords(Seq("BV", "P", "CN", "VN"), times, recs, maxOrder = 3)
    assert(sparkCube.epsilon == coreCube.epsilon)
    for (e <- coreCube.expls.take(200)) {
      val a = sparkCube.series(sparkCube.idOf(e))
      val b = coreCube.series(coreCube.idOf(e))
      assert(a.zip(b).forall { case (x, y) => math.abs(x - y) < 1e-6 }, s"series of $e")
    }
  }

  test("build with dedupIdentical collapses hierarchy duplicates (S&P 500)") {
    val sim = RealWorldSim.sp500()
    val recs = sim.records().filter(_._2 < 12) // small time window for speed
    val df = SynthData.explainRelation(spark, Seq("category", "subcategory", "stock"), recs)
    val deduped = ExplanationCube.build(df, "t", Seq("category", "subcategory", "stock"), "m",
      maxOrder = 3, dedupIdentical = true)
    assert(deduped.epsilon == 610)
  }

  test("absent (explanation, timestamp) combinations aggregate to 0") {
    val recs = Seq(
      (Map("a" -> "x"), 0, 5.0),
      (Map("a" -> "y"), 1, 7.0), // a=x has no rows at t=1
    )
    val df = SynthData.explainRelation(spark, Seq("a"), recs)
    val cube = ExplanationCube.build(df, "t", Seq("a"), "m")
    assert(cube.series(cube.idOf(Expl.of("a" -> "x"))).toSeq == Seq(5.0, 0.0))
  }

  // ------------------------------------------------- window-function deltas

  test("unitDeltasDF (lag window) equals the core unit-segment γ values") {
    val cubeDf = ExplanationCube.cubeDF(synthDf, "t", Seq("category"), "m")
    val deltas = ExplanationCube.unitDeltasDF(cubeDf, "t", Seq("category"))
      .where(col("gid") === 0)
      .select(col("t"), col("category"), col("delta"))
      .collect()
      .map(r => (r.getAs[Any]("t").toString.toInt, r.getString(1), r.getDouble(2)))
    val coreCube = ExplCube.fromRecords(
      Seq("category"), (0 until synthDs.cube.n).map(_.toString), SyntheticGen.records(synthDs))
    for ((t, cat, d) <- deltas) {
      val id = coreCube.idOf(Expl.of("category" -> cat))
      val seg = Segment(t - 1, t)
      assert(math.abs(math.abs(d) - coreCube.gamma(id, seg)) < 1e-6, s"t=$t cat=$cat")
      assert(math.signum(d).toInt == coreCube.tau(id, seg), s"t=$t cat=$cat sign")
    }
  }

  test("unitDeltasDF emits n-1 deltas per explanation") {
    val cubeDf = ExplanationCube.cubeDF(synthDf, "t", Seq("category"), "m")
    val counts = ExplanationCube.unitDeltasDF(cubeDf, "t", Seq("category"))
      .groupBy("gid", "category").count().collect()
    assert(counts.forall(_.getLong(counts.head.fieldIndex("count")) == synthDs.cube.n - 1))
  }
}
