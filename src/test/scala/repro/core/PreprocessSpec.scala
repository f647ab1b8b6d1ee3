package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec

class PreprocessSpec extends SparkSpec {
  import spark.implicits._

  test("numericCols picks numeric types only") {
    val df = Seq((1, 1.5, "a", true)).toDF("i", "d", "s", "b")
    assert(Preprocess.numericCols(df, df.columns.toSeq) == Seq("i", "d"))
  }

  test("categoricalCols picks strings and booleans") {
    val df = Seq((1, 1.5, "a", true)).toDF("i", "d", "s", "b")
    assert(Preprocess.categoricalCols(df, df.columns.toSeq) == Seq("s", "b"))
  }

  test("binarize one-hots frequent levels and drops the source column") {
    val df = Seq("a", "a", "a", "b", "b", "c").toDF("s")
    val out = Preprocess.binarize(df, Seq("s"), maxLevels = 2)
    assert(!out.columns.contains("s"))
    assert(out.columns.toSet == Set("s__is_0", "s__is_1"))
    // most frequent level "a" maps to indicator 0
    assert(out.agg(sum("s__is_0")).head.getDouble(0) == 3.0)
    assert(out.agg(sum("s__is_1")).head.getDouble(0) == 2.0)
  }

  test("binarize rare level becomes all-zero row") {
    val df = Seq("a", "a", "b", "c").toDF("s")
    val out = Preprocess.binarize(df, Seq("s"), maxLevels = 1)
    assert(out.filter(col("s__is_0") === 0.0).count() == 2)
  }

  test("binarize handles null categorical values") {
    val df = Seq(Some("a"), None, Some("a"), Some("b")).toDF("s")
    val out = Preprocess.binarize(df, Seq("s"), maxLevels = 4)
    assert(out.count() == 4)
  }

  test("impute replaces numeric nulls with the median") {
    val df = Seq(Some(1.0), Some(2.0), Some(3.0), None, None).toDF("x")
    val out = Preprocess.impute(df, Seq("x"))
    assert(out.filter(col("x").isNull).count() == 0)
    assert(out.filter(col("x") === 2.0).count() == 3)
  }

  test("impute replaces categorical nulls with observed values") {
    val df = Seq(Some("a"), Some("b"), None, None, None).toDF("s")
    val out = Preprocess.impute(df, Seq("s"))
    assert(out.filter(col("s").isNull).count() == 0)
    val filled = out.select("s").collect().map(_.getString(0)).toSet
    assert(filled.subsetOf(Set("a", "b")))
  }

  test("impute leaves non-null values untouched") {
    val df = Seq(Some(5.0), Some(6.0), Some(7.0), None).toDF("x")
    val out = Preprocess.impute(df, Seq("x"))
    assert(out.filter(col("x") === 5.0).count() == 1)
    assert(out.filter(col("x") === 7.0).count() == 1)
    assert(out.filter(col("x") === 6.0).count() == 2) // null → median 6
  }

  test("prepare returns only numeric double features") {
    val df = Seq((1.0, "a", 5), (2.0, "b", 6), (3.0, "a", 7)).toDF("x", "s", "i")
    val (out, feats) = Preprocess.prepare(df, Seq("x", "s", "i"))
    assert(feats.contains("x") && feats.contains("i"))
    assert(feats.exists(_.startsWith("s__is_")))
    feats.foreach { f =>
      assert(out.schema(f).dataType == org.apache.spark.sql.types.DoubleType)
    }
  }

  test("prepare preserves non-feature columns") {
    val df = Seq((1L, 1.0, "x", 0.0), (2L, 2.0, "y", 1.0)).toDF("id", "f", "c", "t")
    val (out, _) = Preprocess.prepare(df, Seq("f", "c"))
    assert(out.columns.contains("id") && out.columns.contains("t"))
  }

  test("prepare imputes nulls in features") {
    val df = Seq((1L, Some(1.0)), (2L, None), (3L, Some(3.0))).toDF("id", "f")
    val (out, feats) = Preprocess.prepare(df, Seq("f"))
    assert(out.filter(col("f").isNull).count() == 0)
    assert(feats == Seq("f"))
  }

  test("prepare row count is unchanged") {
    val df = Seq((1L, 1.0, "a"), (2L, 2.0, "b"), (3L, 3.0, "c")).toDF("id", "f", "c")
    val (out, _) = Preprocess.prepare(df, Seq("f", "c"))
    assert(out.count() == 3)
  }
}
