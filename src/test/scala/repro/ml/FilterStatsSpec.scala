package repro.ml

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.TaskKind

class FilterStatsSpec extends SparkSpec {
  import spark.implicits._

  test("melt produces one (feature, value, label) triple per cell") {
    val df = Seq((1.0, 2.0, 0.0), (3.0, 4.0, 1.0)).toDF("a", "b", "y")
    val m = FilterStats.melt(df, Seq("a", "b"), "y")
    assert(m.count() == 4)
    assert(m.columns.toSet == Set("__y", "__f", "__v"))
    val cell = m.filter(col("__f") === 1 && col("__y") === 1.0).head
    assert(cell.getDouble(2) == 4.0)
  }

  test("melt aggregation matches DuckDB per-feature sums") {
    val df = Seq((1.0, 10.0, 0.0), (2.0, 20.0, 1.0), (3.0, 30.0, 0.0)).toDF("a", "b", "y")
    val sums = FilterStats.melt(df, Seq("a", "b"), "y")
      .groupBy("__f").agg(sum("__v").as("s"))
      .select(col("__f").cast("int").as("f"), col("s").cast("double").as("s"))
    Oracle.assertEquivalent(sums,
      "SELECT 0 AS f, SUM(CAST(a AS DOUBLE)) AS s FROM t " +
        "UNION ALL SELECT 1 AS f, SUM(CAST(b AS DOUBLE)) AS s FROM t",
      "t" -> df)
  }

  test("regression F matches the closed-form r^2 (n-2) / (1-r^2)") {
    val xs = Seq(1.0, 2.0, 3.0, 4.0, 5.0, 6.0)
    val noise = Seq(0.3, -0.2, 0.25, -0.3, 0.1, -0.15)
    val ys = xs.zip(noise).map { case (x, e) => 2 * x + e }
    val df = xs.zip(ys).toDF("x", "y")
    val f = FilterStats.fScores(df, Seq("x"), "y", TaskKind.Regression)(0)
    // closed form on the driver
    val n = xs.length
    val mx = xs.sum / n; val my = ys.sum / n
    val cov = xs.zip(ys).map { case (a, b) => (a - mx) * (b - my) }.sum / n
    val vx = xs.map(a => (a - mx) * (a - mx)).sum / n
    val vy = ys.map(b => (b - my) * (b - my)).sum / n
    val r2 = cov * cov / (vx * vy)
    val expected = r2 * (n - 2) / (1 - r2)
    assert(math.abs(f - expected) / expected < 1e-6, s"$f vs $expected")
  }

  test("regression F of an uncorrelated feature is small") {
    val df = spark.range(400).select(randn(1).as("x"), randn(2).as("y"))
    val f = FilterStats.fScores(df, Seq("x"), "y", TaskKind.Regression)(0)
    assert(f < 6.0)
  }

  test("regression F of constant feature is zero") {
    val df = Seq((1.0, 1.0), (1.0, 2.0), (1.0, 3.0)).toDF("x", "y")
    assert(FilterStats.fScores(df, Seq("x"), "y", TaskKind.Regression)(0) == 0.0)
  }

  test("classification ANOVA F matches hand computation") {
    // two groups: {1,2,3} and {6,7,8}: SSB = 37.5, SSW = 4, F = 37.5/(4/4)
    val df = Seq((1.0, 0.0), (2.0, 0.0), (3.0, 0.0), (6.0, 1.0), (7.0, 1.0), (8.0, 1.0))
      .toDF("x", "y")
    val f = FilterStats.fScores(df, Seq("x"), "y", TaskKind.Classification)(0)
    assert(math.abs(f - 37.5) < 1e-9, s"F=$f")
  }

  test("classification F ranks a separating feature above noise") {
    val df = spark.range(400).select(
      (col("id") % 2).cast("double").as("y"),
      ((col("id") % 2).cast("double") * 3 + randn(1)).as("sig"),
      randn(2).as("noise"))
    val f = FilterStats.fScores(df, Seq("sig", "noise"), "y", TaskKind.Classification)
    assert(f(0) > 10 * math.max(f(1), 1e-9))
  }

  test("MI of an informative binary feature is near the label entropy") {
    // y == x exactly: MI = H(y) = ln 2
    val df = spark.range(600).select(
      (col("id") % 2).cast("double").as("y"),
      (col("id") % 2).cast("double").as("x"))
    val mi = FilterStats.miScores(df, Seq("x"), "y", TaskKind.Classification)(0)
    assert(math.abs(mi - math.log(2)) < 0.02, s"mi=$mi")
  }

  test("MI of independent noise is near zero") {
    val df = spark.range(800).select((col("id") % 2).cast("double").as("y"), randn(5).as("x"))
    val mi = FilterStats.miScores(df, Seq("x"), "y", TaskKind.Classification)(0)
    assert(mi < 0.05, s"mi=$mi")
  }

  test("MI works for regression targets via label binning") {
    val df = spark.range(600).select(randn(1).as("x")).withColumn("y", col("x") * 2)
    val mi = FilterStats.miScores(df, Seq("x"), "y", TaskKind.Regression)(0)
    val dfN = spark.range(600).select(randn(2).as("x"), randn(3).as("y"))
    val miN = FilterStats.miScores(dfN, Seq("x"), "y", TaskKind.Regression)(0)
    assert(mi > 4 * miN, s"signal mi=$mi noise mi=$miN")
  }

  test("fScores returns one score per feature in order") {
    val df = Seq((1.0, 2.0, 3.0, 0.0), (2.0, 1.0, 3.0, 1.0), (3.0, 0.0, 3.0, 0.0),
                 (4.0, 2.0, 3.0, 1.0)).toDF("a", "b", "c", "y")
    val f = FilterStats.fScores(df, Seq("a", "b", "c"), "y", TaskKind.Classification)
    assert(f.length == 3)
    assert(f(2) == 0.0) // constant feature
  }

  test("FStatAgg merge is associative over partitions") {
    val agg = new FilterStats.FStatAgg
    val pts = Seq((1.0, 2.0), (2.0, 4.1), (3.0, 5.9), (4.0, 8.2))
    val whole = pts.foldLeft(agg.zero)(agg.reduce)
    val (l, r) = pts.splitAt(2)
    val merged = agg.merge(l.foldLeft(agg.zero)(agg.reduce), r.foldLeft(agg.zero)(agg.reduce))
    assert(math.abs(agg.finish(whole) - agg.finish(merged)) < 1e-9)
  }
}
