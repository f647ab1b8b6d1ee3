package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class JoinExecSpec extends SparkSpec {
  import spark.implicits._

  test("inferGranularity detects day-resolution keys") {
    val df = Seq(86400.0 * 100, 86400.0 * 101, 86400.0 * 350).toDF("ts")
    assert(JoinExec.inferGranularity(df, "ts").contains(86400.0))
  }

  test("inferGranularity detects hour-resolution keys") {
    val df = Seq(3600.0 * 5, 3600.0 * 7, 86400.0 * 2).toDF("ts")
    assert(JoinExec.inferGranularity(df, "ts").contains(3600.0))
  }

  test("inferGranularity detects minute and second resolutions") {
    assert(JoinExec.inferGranularity(Seq(60.0, 120.0, 180.0).toDF("t"), "t").contains(60.0))
    assert(JoinExec.inferGranularity(Seq(61.0, 122.0).toDF("t"), "t").contains(1.0))
  }

  test("inferGranularity returns None for non-time-like keys") {
    val df = Seq(0.5, 1.25, 3.75).toDF("t")
    assert(JoinExec.inferGranularity(df, "t").isEmpty)
  }

  test("aggregateByKeys averages numeric and mins categorical payloads") {
    val df = Seq((1L, 10.0, "b"), (1L, 20.0, "a"), (2L, 5.0, "c")).toDF("k", "v", "s")
    val out = JoinExec.aggregateByKeys(df, Seq("k")).orderBy("k").collect()
    assert(out(0).getDouble(1) == 15.0 && out(0).getString(2) == "a")
    assert(out(1).getDouble(1) == 5.0 && out(1).getString(2) == "c")
  }

  test("aggregateByKeys matches DuckDB GROUP BY") {
    val df = Seq((1L, 10.0), (1L, 20.0), (2L, 5.0), (2L, 7.0), (3L, 1.0)).toDF("k", "v")
    val out = JoinExec.aggregateByKeys(df, Seq("k"))
      .select(col("k").cast("long").as("k"), col("v").cast("double").as("v"))
    Oracle.assertEquivalent(out,
      "SELECT CAST(k AS BIGINT) AS k, AVG(CAST(v AS DOUBLE)) AS v FROM t GROUP BY k",
      "t" -> df)
  }

  test("hasDuplicateKeys") {
    assert(JoinExec.hasDuplicateKeys(Seq((1, 1), (1, 2)).toDF("k", "v"), Seq("k")))
    assert(!JoinExec.hasDuplicateKeys(Seq((1, 1), (2, 2)).toDF("k", "v"), Seq("k")))
  }

  test("hard join is a LEFT join preserving all base rows") {
    val base = Seq((1L, 10L), (2L, 20L), (3L, 99L)).toDF("id", "k")
    val f = Seq((10L, 1.0), (20L, 2.0)).toDF("fk", "v")
    val out = JoinExec.join(base, CandidateJoin("t", f, Seq(KeyPair("k", "fk", KeyKind.Hard))))
    assert(out.count() == 3)
    assert(out.columns.toSet == Set("id", "k", "t__v"))
    val m = out.collect().map(r => r.getLong(0) -> Option(r.get(2))).toMap
    assert(m(1L).contains(1.0) && m(2L).contains(2.0) && m(3L).isEmpty)
  }

  test("hard left join matches DuckDB left join") {
    val base = Seq((1L, 10L), (2L, 20L), (3L, 99L)).toDF("id", "k")
    val f = Seq((10L, 1.0), (20L, 2.0)).toDF("fk", "v")
    val out = JoinExec.join(base, CandidateJoin("t", f, Seq(KeyPair("k", "fk", KeyKind.Hard))))
      .select(col("id").cast("long").as("id"), col("t__v").cast("double").as("t__v"))
    Oracle.assertEquivalent(out,
      "SELECT CAST(b.id AS BIGINT) AS id, CAST(f.v AS DOUBLE) AS t__v " +
        "FROM b LEFT JOIN f ON b.k = f.fk",
      "b" -> base, "f" -> f)
  }

  test("one-to-many foreign rows are pre-aggregated, not duplicated") {
    val base = Seq((1L, 10L), (2L, 20L)).toDF("id", "k")
    val f = Seq((10L, 1.0), (10L, 3.0), (20L, 5.0)).toDF("fk", "v")
    val out = JoinExec.join(base, CandidateJoin("t", f, Seq(KeyPair("k", "fk", KeyKind.Hard))))
    assert(out.count() == 2)
    val m = out.collect().map(r => r.getLong(0) -> r.getDouble(2)).toMap
    assert(m(1L) == 2.0 && m(2L) == 5.0)
  }

  test("composite hard key join") {
    val base = Seq((1L, 1L, 1L), (2L, 1L, 2L)).toDF("id", "k1", "k2")
    val f = Seq((1L, 1L, 7.0), (1L, 2L, 9.0)).toDF("a", "b", "v")
    val out = JoinExec.join(base, CandidateJoin("t", f,
      Seq(KeyPair("k1", "a", KeyKind.Hard), KeyPair("k2", "b", KeyKind.Hard))))
    val m = out.collect().map(r => r.getLong(0) -> r.getDouble(3)).toMap
    assert(m(1L) == 7.0 && m(2L) == 9.0)
  }

  test("soft NN join picks the nearest foreign key") {
    val base = Seq((1L, 10.0), (2L, 26.0)).toDF("id", "t")
    val f = Seq((9.0, 100.0), (20.0, 200.0), (30.0, 300.0)).toDF("ft", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("t", "ft", KeyKind.Soft))),
                            SoftJoinMethod.NearestNeighbour)
    val m = out.collect().map(r => r.getLong(0) -> r.getDouble(2)).toMap
    assert(m(1L) == 100.0) // 10 closest to 9
    assert(m(2L) == 300.0) // 26 closest to 30 (dist 4) vs 20 (dist 6)
  }

  test("soft NN join exact match has distance zero") {
    val base = Seq((1L, 20.0)).toDF("id", "t")
    val f = Seq((19.0, 1.0), (20.0, 2.0), (21.0, 3.0)).toDF("ft", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("t", "ft", KeyKind.Soft))),
                            SoftJoinMethod.NearestNeighbour)
    assert(out.head.getDouble(2) == 2.0)
  }

  test("soft NN join respects the tolerance threshold") {
    val base = Seq((1L, 10.0), (2L, 100.0)).toDF("id", "t")
    val f = Seq((12.0, 7.0)).toDF("ft", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("t", "ft", KeyKind.Soft))),
                            SoftJoinMethod.NearestNeighbour, tolerance = Some(5.0))
    val m = out.collect().map(r => r.getLong(0) -> Option(r.get(2))).toMap
    assert(m(1L).contains(7.0))
    assert(m(2L).isEmpty) // |100−12| > 5 ⇒ null
  }

  test("two-way NN join interpolates linearly between bracketing rows") {
    val base = Seq((1L, 15.0)).toDF("id", "t")
    val f = Seq((10.0, 100.0), (20.0, 200.0)).toDF("ft", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("t", "ft", KeyKind.Soft))),
                            SoftJoinMethod.TwoWayNearestNeighbour)
    // x=15 ⇒ λ = (20−15)/(20−10) = 0.5 ⇒ 0.5·100 + 0.5·200 = 150
    assert(math.abs(out.head.getDouble(2) - 150.0) < 1e-9)
  }

  test("two-way NN join weights the nearer bracketing row more") {
    val base = Seq((1L, 12.0)).toDF("id", "t")
    val f = Seq((10.0, 100.0), (20.0, 200.0)).toDF("ft", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("t", "ft", KeyKind.Soft))),
                            SoftJoinMethod.TwoWayNearestNeighbour)
    // λ = (20−12)/10 = 0.8 ⇒ 0.8·100 + 0.2·200 = 120
    assert(math.abs(out.head.getDouble(2) - 120.0) < 1e-9)
  }

  test("two-way NN join falls back to the single available side") {
    val base = Seq((1L, 5.0), (2L, 25.0)).toDF("id", "t")
    val f = Seq((10.0, 100.0), (20.0, 200.0)).toDF("ft", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("t", "ft", KeyKind.Soft))),
                            SoftJoinMethod.TwoWayNearestNeighbour)
    val m = out.collect().map(r => r.getLong(0) -> r.getDouble(2)).toMap
    assert(m(1L) == 100.0) // only a next row exists
    assert(m(2L) == 200.0) // only a prev row exists
  }

  test("two-way NN join picks one of the bracketing categorical values") {
    val base = Seq((1L, 15.0)).toDF("id", "t")
    val f = Seq((10.0, "lo"), (20.0, "hi")).toDF("ft", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("t", "ft", KeyKind.Soft))),
                            SoftJoinMethod.TwoWayNearestNeighbour)
    assert(Set("lo", "hi").contains(out.head.getString(2)))
  }

  test("time resampling aggregates a finer foreign table to base granularity") {
    val day = 86400.0
    val base = Seq((1L, day * 10), (2L, day * 11)).toDF("id", "ts")
    // hourly foreign rows within day 10 average to 2.0; day 11 to 6.0
    val f = Seq((day * 10, 1.0), (day * 10 + 3600, 3.0),
                (day * 11 + 3600, 5.0), (day * 11 + 7200, 7.0)).toDF("ts", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("ts", "ts", KeyKind.Soft))),
                            SoftJoinMethod.HardWithResampling)
    val m = out.collect().map(r => r.getLong(0) -> r.getDouble(2)).toMap
    assert(m(1L) == 2.0 && m(2L) == 6.0)
  }

  test("hard unmodified join on mismatched granularity loses matches") {
    val day = 86400.0
    val base = Seq((1L, day * 10)).toDF("id", "ts")
    val f = Seq((day * 10 + 3600, 3.0)).toDF("ts", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("ts", "ts", KeyKind.Soft))),
                            SoftJoinMethod.HardUnmodified)
    assert(out.head.isNullAt(2))
  }

  test("NN soft join also resamples finer foreign tables first") {
    val day = 86400.0
    val base = Seq((1L, day * 10)).toDF("id", "ts")
    val f = Seq((day * 10, 1.0), (day * 10 + 3600, 3.0)).toDF("ts", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("ts", "ts", KeyKind.Soft))),
                            SoftJoinMethod.NearestNeighbour)
    assert(out.head.getDouble(2) == 2.0) // aggregated day value, not one hour's
  }

  test("mixed composite key: hard component partitions the soft match") {
    val base = Seq((1L, 1L, 10.0), (2L, 2L, 10.0)).toDF("id", "g", "t")
    val f = Seq((1L, 11.0, 100.0), (2L, 9.0, 200.0)).toDF("g", "ft", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f,
      Seq(KeyPair("g", "g", KeyKind.Hard), KeyPair("t", "ft", KeyKind.Soft))),
      SoftJoinMethod.NearestNeighbour)
    val m = out.collect().map(r => r.getLong(0) -> r.getDouble(3)).toMap
    assert(m(1L) == 100.0 && m(2L) == 200.0)
  }

  test("soft join preserves all base rows and columns") {
    val base = Seq((1L, 5.0, "x"), (2L, 7.0, "y")).toDF("id", "t", "extra")
    val f = Seq((6.0, 1.0)).toDF("ft", "v")
    val out = JoinExec.join(base, CandidateJoin("w", f, Seq(KeyPair("t", "ft", KeyKind.Soft))),
                            SoftJoinMethod.NearestNeighbour)
    assert(out.count() == 2)
    assert(out.columns.toSeq == Seq("id", "t", "extra", "w__v"))
  }

  test("payload columns are prefixed with the candidate name") {
    val base = Seq((1L, 10L)).toDF("id", "k")
    val f = Seq((10L, 1.0, 2.0)).toDF("fk", "a", "b")
    val out = JoinExec.join(base, CandidateJoin("tbl", f, Seq(KeyPair("k", "fk", KeyKind.Hard))))
    assert(out.columns.toSet == Set("id", "k", "tbl__a", "tbl__b"))
  }
}
