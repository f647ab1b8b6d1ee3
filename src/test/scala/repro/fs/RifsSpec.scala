package repro.fs

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.TaskKind

class RifsSpec extends SparkSpec {
  import spark.implicits._

  private lazy val cls = spark.range(400).select(
    (col("id") % 2).cast("double").as("y"),
    ((col("id") % 2).cast("double") * 2 + randn(1) * 0.3).as("s1"),
    ((col("id") % 2).cast("double") * 1.5 + randn(2) * 0.4).as("s2"),
    randn(3).as("n1"), randn(4).as("n2"), randn(5).as("n3"),
    randn(6).as("n4"), randn(7).as("n5")).cache()

  private val feats = Seq("s1", "s2", "n1", "n2", "n3", "n4", "n5")
  private val fastCfg = Rifs.RifsConfig(repeats = 3, thresholds = Seq(0.5, 1.0))

  test("injectColumns appends the requested number of noise columns") {
    for (kind <- Seq(Rifs.InjectKind.Gaussian, Rifs.InjectKind.Uniform,
                     Rifs.InjectKind.Bernoulli, Rifs.InjectKind.Poisson,
                     Rifs.InjectKind.MomentMatched)) {
      val (out, noise) = Rifs.injectColumns(cls, feats, 3, kind, 4, 1L)
      assert(noise == Seq("__noise_0", "__noise_1", "__noise_2"))
      assert(out.count() == cls.count())
      noise.foreach(c => assert(out.schema.fieldNames.contains(c)))
    }
  }

  test("Bernoulli injection is 0/1 valued") {
    val (out, noise) = Rifs.injectColumns(cls, feats, 2, Rifs.InjectKind.Bernoulli, 4, 2L)
    val vals = out.select(noise.head).distinct().collect().map(_.getDouble(0)).toSet
    assert(vals.subsetOf(Set(0.0, 1.0)))
  }

  test("Poisson injection is nonnegative integer valued") {
    val (out, noise) = Rifs.injectColumns(cls, feats, 2, Rifs.InjectKind.Poisson, 4, 3L)
    val ok = out.select(noise.head).collect().map(_.getDouble(0))
      .forall(v => v >= 0 && v == math.rint(v))
    assert(ok)
  }

  test("moment-matched injection approximately matches the empirical row mean") {
    // E[sample] = per-row mean of the feature columns.
    val (out, noise) = Rifs.injectColumns(cls, feats, 30, Rifs.InjectKind.MomentMatched, 7, 4L)
    val rowMeanAvg = cls.select((feats.map(col).reduce(_ + _) / feats.length).as("m"))
      .agg(avg("m")).head.getDouble(0)
    val injAvg = out.select((noise.map(col).reduce(_ + _) / noise.length).as("m"))
      .agg(avg("m")).head.getDouble(0)
    assert(math.abs(injAvg - rowMeanAvg) < 0.4, s"$injAvg vs $rowMeanAvg")
  }

  test("noiseOutrankFractions scores signal near 1 and noise lower") {
    val r = Rifs.noiseOutrankFractions(cls, feats, "y", TaskKind.Classification,
                                       fastCfg, seed = 5L)
    val byName = feats.zip(r).toMap
    assert(byName("s1") >= 0.66, s"s1 fraction ${byName("s1")}")
    val noiseAvg = Seq("n1", "n2", "n3", "n4", "n5").map(byName).sum / 5
    assert(byName("s1") > noiseAvg)
  }

  test("select keeps planted signal and prunes most noise") {
    val sel = Rifs.select(cls, feats, "y", TaskKind.Classification, fastCfg, seed = 6L)
    assert(sel.contains("s1"))
    val keptNoise = sel.count(_.startsWith("n"))
    assert(keptNoise <= 2, s"kept noise: $sel")
  }

  test("select on pure noise prunes everything or nearly so") {
    val noiseDf = spark.range(300).select(
      (col("id") % 2).cast("double").as("y"),
      randn(11).as("a"), randn(12).as("b"), randn(13).as("c"), randn(14).as("d"))
    val sel = Rifs.select(noiseDf, Seq("a", "b", "c", "d"), "y", TaskKind.Classification,
                          fastCfg, seed = 7L)
    assert(sel.length <= 2, s"selected from pure noise: $sel")
  }

  test("select works for regression") {
    val reg = spark.range(400).select(randn(1).as("s"), randn(2).as("n1"), randn(3).as("n2"))
      .withColumn("y", col("s") * 3 + randn(4) * 0.2)
    val sel = Rifs.select(reg, Seq("s", "n1", "n2"), "y", TaskKind.Regression, fastCfg, 8L)
    assert(sel.contains("s"))
  }

  test("select on empty feature list returns empty") {
    assert(Rifs.select(cls, Nil, "y", TaskKind.Classification, fastCfg, 9L).isEmpty)
  }

  test("RIFS is deterministic in the seed") {
    val a = Rifs.select(cls, feats, "y", TaskKind.Classification, fastCfg, 10L)
    val b = Rifs.select(cls, feats, "y", TaskKind.Classification, fastCfg, 10L)
    assert(a == b)
  }
}
