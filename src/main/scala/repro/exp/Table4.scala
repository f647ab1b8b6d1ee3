package repro.exp

import org.apache.spark.sql.SparkSession

import repro.core._
import repro.data.SynthWorlds
import repro.fs.FeatureSelectors

/** Table 4: the Tuple-Ratio rule as a pre-filtering step for ARDA with
  * RIFS — score change, speedup, tables removed and the τ used, per
  * dataset.
  */
object Table4 {

  final case class Row(dataset: String, scoreChange: Double, speedup: Double,
                       removed: Int, tau: Double)

  def rowFor(world: SynthWorlds.World, cfg: ArdaConfig, tau: Double): Row = {
    val rifs = () => new FeatureSelectors.RifsSelector(Harness.RifsBench)
    val noTr = Arda.run(world.task, cfg, rifs())
    val tr   = Arda.run(world.task, cfg.copy(trTau = Some(tau)), rifs())
    Row(world.task.name,
        Harness.pctChange(world.task.task, tr.augmentedScore, noTr.augmentedScore),
        if (tr.totalSeconds > 0) noTr.totalSeconds / tr.totalSeconds else 1.0,
        noTr.nCandidatesAfterFilter - tr.nCandidatesAfterFilter,
        tau)
  }

  def run(spark: SparkSession): Seq[String] = {
    val worlds = SynthWorlds.all(spark)
    worlds.map { w =>
      val tau = Harness.PaperTaus.getOrElse(w.task.name, 20.0)
      val r = rowFor(w, Harness.benchCfg, tau)
      f"${r.dataset}%-12s | score change=${Harness.pct(r.scoreChange)}%-9s | " +
        f"speed=${r.speedup}%5.2fx | tables removed=${r.removed}%3d | tau=${r.tau}%.0f"
    }
  }
}
