package repro.bench

import repro.SparkSpec
import repro.exp._

/** Benchmark suites, one per evaluation table of the paper. Each prints
  * its rows and persists them under bench_results/ for EXPERIMENTS.md.
  * Assertions are sanity-level (non-empty, expected row counts) — the
  * numbers themselves are recorded, not asserted, since absolute values
  * are hardware- and data-dependent.
  */
class Table1Bench extends SparkSpec {
  test("Table 1: feature selectors on real-world-analogue datasets") {
    val lines = Table1.run(spark)
    Harness.emit("table1", lines)
    assert(lines.nonEmpty)
    assert(lines.exists(_.contains("RIFS")))
  }
}

class Table2Bench extends SparkSpec {
  test("Table 2: coreset strategies on classification datasets") {
    val lines = Table2.run(spark)
    Harness.emit("table2", lines)
    assert(lines.size == 27) // 3 datasets x 9 methods
  }
}

class Table3Bench extends SparkSpec {
  test("Table 3: sketching vs uniform on regression datasets") {
    val lines = Table3.run(spark)
    Harness.emit("table3", lines)
    assert(lines.size == 27) // 3 datasets x 9 methods
  }
}

class Table4Bench extends SparkSpec {
  test("Table 4: Tuple-Ratio prefiltering for ARDA + RIFS") {
    val lines = Table4.run(spark)
    Harness.emit("table4", lines)
    assert(lines.size == 5)
    // TR filtering must remove tables on every dataset (the worlds plant
    // high-TR tables matching the paper's per-dataset proportions).
    assert(lines.forall(l => !l.contains("tables removed=  0")))
  }
}

class Table5Bench extends SparkSpec {
  test("Table 5: table grouping strategies vs budget-join") {
    val lines = Table5.run(spark)
    Harness.emit("table5", lines)
    assert(lines.size == 16) // 4 datasets x 4 methods
  }
}

class Table6Bench extends SparkSpec {
  test("Table 6: feature selectors on micro benchmarks") {
    val lines = Table6.run(spark)
    Harness.emit("table6", lines)
    assert(lines.count(_.startsWith("Kraken")) >= 10)
    assert(lines.count(_.startsWith("Digits")) >= 10)
  }
}
