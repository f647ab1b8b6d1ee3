package repro.fs

import org.apache.spark.sql.DataFrame

import repro.core.TaskKind

/** A feature selector: returns the subset of `features` to keep. This is
  * the interface ARDA invokes per join batch (§3) and the micro
  * benchmarks invoke over a noise-augmented matrix (§7.2).
  */
trait FeatureSelector {
  def name: String
  def supports(task: TaskKind): Boolean = true
  def select(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, seed: Long): Seq[String]
}

object FeatureSelectors {

  /** Keep everything — the paper's "all features" row. */
  object KeepAll extends FeatureSelector {
    val name = "all features"
    def select(df: DataFrame, features: Seq[String], target: String,
               task: TaskKind, seed: Long): Seq[String] = features
  }

  /** Ranker + the paper's exponential search (§6.3) — used for random
    * forest, sparse regression, mutual info, f-test, lasso, logistic,
    * linear svc and relief rows of Table 1/6.
    */
  final class Ranked(ranker: Ranker) extends FeatureSelector {
    val name: String = ranker.name
    override def supports(task: TaskKind): Boolean = ranker.supports(task)
    def select(df: DataFrame, features: Seq[String], target: String,
               task: TaskKind, seed: Long): Seq[String] = {
      val scores = ranker.rank(df, features, target, task, seed)
      Selection.exponentialSearch(df, Selection.orderByScore(features, scores), target, task, seed)
    }
  }

  /** Forward selection over the RF ranking (the paper uses the RF ranker
    * for the wrapper methods).
    */
  object Forward extends FeatureSelector {
    val name = "forward selection"
    def select(df: DataFrame, features: Seq[String], target: String,
               task: TaskKind, seed: Long): Seq[String] = {
      val scores = Rankers.RandomForestRanker.rank(df, features, target, task, seed)
      Selection.forward(df, Selection.orderByScore(features, scores), target, task, seed)
    }
  }

  /** Backward elimination over the RF ranking. */
  object Backward extends FeatureSelector {
    val name = "backward selection"
    def select(df: DataFrame, features: Seq[String], target: String,
               task: TaskKind, seed: Long): Seq[String] = {
      val scores = Rankers.RandomForestRanker.rank(df, features, target, task, seed)
      Selection.backward(df, Selection.orderByScore(features, scores), target, task, seed)
    }
  }

  /** Recursive feature elimination with the RF ranker. */
  object Rfe extends FeatureSelector {
    val name = "RFE"
    def select(df: DataFrame, features: Seq[String], target: String,
               task: TaskKind, seed: Long): Seq[String] =
      Selection.rfe(df, features, target, task, seed)
  }

  /** RIFS (§6) with the given configuration. */
  final class RifsSelector(cfg: Rifs.RifsConfig = Rifs.RifsConfig()) extends FeatureSelector {
    val name = "RIFS"
    def select(df: DataFrame, features: Seq[String], target: String,
               task: TaskKind, seed: Long): Seq[String] =
      Rifs.select(df, features, target, task, cfg, seed)
  }

  /** All Table 1/6 selectors by display name. */
  def standard(rifsCfg: Rifs.RifsConfig = Rifs.RifsConfig()): Seq[FeatureSelector] = Seq(
    new RifsSelector(rifsCfg),
    Backward,
    Forward,
    Rfe,
    new Ranked(new Rankers.SparseRegressionRanker()),
    new Ranked(Rankers.RandomForestRanker),
    new Ranked(Rankers.FTestRanker),
    new Ranked(Rankers.LassoRanker),
    new Ranked(Rankers.MutualInfoRanker),
    new Ranked(Rankers.ReliefRanker),
    new Ranked(Rankers.LinearSVCRanker),
    new Ranked(Rankers.LogisticRanker),
  )
}
