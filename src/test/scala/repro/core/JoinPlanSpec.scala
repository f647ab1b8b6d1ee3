package repro.core

import repro.{Oracle, SparkSpec}
import org.apache.spark.sql.functions._

class JoinPlanSpec extends SparkSpec {
  import spark.implicits._

  private def cand(name: String, df: org.apache.spark.sql.DataFrame,
                   key: String = "k", fk: String = "fk",
                   kind: KeyKind = KeyKind.Hard, score: Option[Double] = None) =
    CandidateJoin(name, df, Seq(KeyPair(key, fk, kind)), discoveryScore = score)

  test("intersection score counts matched distinct base keys") {
    val base = Seq(1L, 2L, 3L, 4L).toDF("k")
    val f = Seq(1L, 2L, 9L).toDF("fk")
    assert(JoinPlan.intersectionScore(base, cand("t", f)) == 0.5)
  }

  test("intersection score is computed over distinct keys") {
    val base = Seq(1L, 1L, 1L, 2L).toDF("k")
    val f = Seq(1L).toDF("fk")
    assert(JoinPlan.intersectionScore(base, cand("t", f)) == 0.5)
  }

  test("intersection score matches DuckDB semi-join count") {
    val base = Seq(1L, 2L, 3L, 4L, 5L).toDF("k")
    val f = Seq(2L, 3L, 9L).toDF("fk")
    val matched = base.select("k").distinct()
      .join(f.select(col("fk").as("k")).distinct(), Seq("k"), "left_semi")
      .agg(count("*").as("n"))
    Oracle.assertEquivalent(matched,
      "SELECT COUNT(*) AS n FROM (SELECT DISTINCT k FROM b WHERE k IN (SELECT fk FROM f))",
      "b" -> base, "f" -> f)
  }

  test("pure soft-key candidates score 1.0") {
    val base = Seq(1.0, 2.0).toDF("t")
    val f = Seq(5.0).toDF("ft")
    assert(JoinPlan.intersectionScore(base, cand("t", f, "t", "ft", KeyKind.Soft)) == 1.0)
  }

  test("tuple ratio is base rows over foreign key domain") {
    val f = Seq(1L, 2L, 2L, 3L).toDF("fk") // 3 distinct keys
    assert(JoinPlan.tupleRatio(12L, cand("t", f)) == 4.0)
  }

  test("trFilter removes candidates with TR >= tau") {
    val small = Seq(1L, 2L).toDF("fk")       // TR = 100/2 = 50
    val big = (1L to 100L).toDF("fk")        // TR = 1
    val base = (1L to 100L).toDF("k")
    val planned = JoinPlan.plan(base, Seq(cand("small", small), cand("big", big)))
    val kept = JoinPlan.trFilter(planned, 15.0)
    assert(kept.map(_.cand.name) == Seq("big"))
  }

  test("plan uses the discovery score when present") {
    val base = Seq(1L).toDF("k")
    val f = Seq(9L).toDF("fk")
    val p = JoinPlan.plan(base, Seq(cand("t", f, score = Some(0.77))))
    assert(p.head.score == 0.77)
  }

  test("plan counts payload features excluding key columns") {
    val base = Seq(1L).toDF("k")
    val f = Seq((1L, 1.0, 2.0, "s")).toDF("fk", "a", "b", "c")
    val p = JoinPlan.plan(base, Seq(cand("t", f)))
    assert(p.head.nFeatures == 3)
  }

  test("expandAlternatives emits one candidate per alt key option") {
    val f = Seq((1L, 2L, 1.0)).toDF("fk1", "fk2", "v")
    val c = CandidateJoin("t", f, Seq(KeyPair("a", "fk1", KeyKind.Hard)),
      altKeys = Seq(Seq(KeyPair("b", "fk2", KeyKind.Hard))))
    val out = JoinPlan.expandAlternatives(Seq(c))
    assert(out.map(_.name) == Seq("t", "t__alt0"))
    assert(out(1).keys.head.baseCol == "b")
  }

  test("table-join grouping is one candidate per batch, highest score first") {
    val base = Seq(1L).toDF("k")
    val f1 = Seq(1L).toDF("fk"); val f2 = Seq(1L).toDF("fk")
    val planned = JoinPlan.plan(base,
      Seq(cand("lo", f1, score = Some(0.1)), cand("hi", f2, score = Some(0.9))))
    val g = JoinPlan.group(planned, GroupingStrategy.TableJoin, 100)
    assert(g.map(_.map(_.cand.name)) == Seq(Seq("hi"), Seq("lo")))
  }

  test("full materialization grouping is a single batch") {
    val base = Seq(1L).toDF("k")
    val planned = JoinPlan.plan(base, Seq(cand("a", Seq(1L).toDF("fk")), cand("b", Seq(1L).toDF("fk"))))
    val g = JoinPlan.group(planned, GroupingStrategy.FullMaterialization, 1)
    assert(g.size == 1 && g.head.size == 2)
  }

  test("budget grouping packs features up to the budget") {
    val base = Seq(1L).toDF("k")
    def wide(name: String, n: Int) = {
      val cols = Seq(col("id").as("fk")) ++ (0 until n).map(i => rand(i).as(s"c$i"))
      cand(name, spark.range(2).select(cols: _*), score = Some(1.0 - name.hashCode % 10 * 0.01))
    }
    val planned = JoinPlan.plan(base, Seq(wide("a", 3), wide("b", 3), wide("c", 3)))
    val g = JoinPlan.group(planned, GroupingStrategy.BudgetJoin, 6)
    assert(g.size == 2)
    assert(g.map(_.map(_.nFeatures).sum).forall(_ <= 6))
  }

  test("a table wider than the budget ships alone") {
    val base = Seq(1L).toDF("k")
    val cols = Seq(col("id").as("fk")) ++ (0 until 10).map(i => rand(i).as(s"c$i"))
    val wide = cand("wide", spark.range(2).select(cols: _*))
    val slim = cand("slim", Seq((1L, 1.0)).toDF("fk", "v"))
    val planned = JoinPlan.plan(base, Seq(wide, slim))
    val g = JoinPlan.group(planned, GroupingStrategy.BudgetJoin, 5)
    assert(g.exists(b => b.map(_.cand.name) == Seq("wide")))
  }

  test("batches are ordered by score priority") {
    val base = Seq(1L).toDF("k")
    val planned = JoinPlan.plan(base, Seq(
      cand("worst", Seq((1L, 1.0)).toDF("fk", "v"), score = Some(0.1)),
      cand("best", Seq((1L, 1.0)).toDF("fk", "v"), score = Some(0.9))))
    val g = JoinPlan.group(planned, GroupingStrategy.BudgetJoin, 1)
    assert(g.head.head.cand.name == "best")
  }
}
