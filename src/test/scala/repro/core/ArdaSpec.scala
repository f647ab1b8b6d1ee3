package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.data.SynthWorlds
import repro.fs.{FeatureSelectors, Rankers, Rifs}

/** End-to-end ARDA on a small world: the augmented model must beat the
  * baseline, signal tables must be discovered, and every configuration
  * axis (grouping, TR filter, sketch coreset) must run.
  */
class ArdaSpec extends SparkSpec {

  // A compact hard-key world: cheap enough for unit tests.
  private def miniWorld = {
    val w = SynthWorlds.schoolL(spark, nTables = 10)
    w
  }

  private val fastRifs = new FeatureSelectors.RifsSelector(
    Rifs.RifsConfig(repeats = 3, thresholds = Seq(0.5, 1.0)))

  private def cfg = ArdaConfig(coresetSize = 500)

  test("pipeline plans, filters and batches candidates") {
    val p = new ArdaPipeline(miniWorld.task, cfg)
    try {
      assert(p.planned.size == 10)
      assert(p.batches.nonEmpty)
      assert(p.batches.flatten.size == 10)
    } finally p.close()
  }

  test("KeepAll augmentation beats the baseline on a signal-rich world") {
    val r = Arda.run(miniWorld.task, cfg, FeatureSelectors.KeepAll)
    assert(r.augmentedScore > r.baselineScore,
           s"aug ${r.augmentedScore} vs base ${r.baselineScore}")
    assert(r.selected.nonEmpty)
  }

  test("RIFS augmentation beats the baseline and keeps signal tables") {
    val w = miniWorld
    val r = Arda.run(w.task, cfg, fastRifs)
    assert(r.augmentedScore > r.baselineScore,
           s"aug ${r.augmentedScore} vs base ${r.baselineScore}")
    assert(r.keptCandidates.exists(w.signalTables.contains),
           s"kept ${r.keptCandidates}, signal ${w.signalTables}")
  }

  test("random-forest selector discovers signal tables") {
    val w = miniWorld
    val r = Arda.run(w.task, cfg, new FeatureSelectors.Ranked(Rankers.RandomForestRanker))
    assert(r.keptCandidates.exists(w.signalTables.contains))
  }

  test("TR prefilter reduces candidate count and still runs") {
    val r = Arda.run(miniWorld.task, cfg.copy(trTau = Some(15.0)), FeatureSelectors.KeepAll)
    assert(r.nCandidatesAfterFilter < r.nCandidates)
    assert(r.augmentedScore > Double.MinValue)
  }

  test("table-join grouping produces one batch per candidate") {
    val p = new ArdaPipeline(miniWorld.task, cfg.copy(grouping = GroupingStrategy.TableJoin))
    try assert(p.batches.size == 10)
    finally p.close()
  }

  test("full materialization grouping produces a single batch") {
    val p = new ArdaPipeline(miniWorld.task, cfg.copy(grouping = GroupingStrategy.FullMaterialization))
    try assert(p.batches.size == 1)
    finally p.close()
  }

  test("sketch coreset strategy runs end to end") {
    val r = Arda.run(miniWorld.task, cfg.copy(coresetStrategy = CoresetStrategy.Sketch),
                     new FeatureSelectors.Ranked(Rankers.FTestRanker))
    assert(r.augmentedScore > Double.MinValue)
  }

  test("fs time is measured and batches counted") {
    val r = Arda.run(miniWorld.task, cfg, new FeatureSelectors.Ranked(Rankers.FTestRanker))
    assert(r.fsSeconds > 0)
    assert(r.nBatches >= 1)
  }

  test("soft-join world runs end to end (taxi subset)") {
    val w = SynthWorlds.taxi(spark)
    val sub = w.task.copy(candidates = w.task.candidates.filter(c =>
      Set("weather0", "events", "tnoise0", "mnoise0").contains(c.name)))
    val r = Arda.run(sub, cfg, new FeatureSelectors.Ranked(Rankers.RandomForestRanker))
    assert(r.augmentedScore > r.baselineScore,
           s"aug ${r.augmentedScore} vs base ${r.baselineScore}")
  }
}
