package repro.fs

import org.apache.spark.ml.classification.{LinearSVC, LogisticRegression, OneVsRest, RandomForestClassifier}
import org.apache.spark.ml.classification.LinearSVCModel
import org.apache.spark.ml.feature.VectorAssembler
import org.apache.spark.ml.regression.{LinearRegression, RandomForestRegressor}
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.TaskKind
import repro.ml.{Estimator, FilterStats, MatrixOps, Relief, SparseRegression}

/** A feature ranker: assigns every feature a relevance score (higher =
  * better). Rankers are combined with a subset-selection strategy
  * ([[Selection]]) to form a feature selector (§5, §7).
  */
trait Ranker {
  def name: String
  /** Whether this ranker applies to the task (e.g. lasso is regression-only). */
  def supports(task: TaskKind): Boolean = true
  def rank(df: DataFrame, features: Seq[String], target: String,
           task: TaskKind, seed: Long): Array[Double]
}

object Rankers {

  // coalesce(4): see Estimator.assemble — scheduling beats compute at
  // coreset scale otherwise.
  private def assemble(df: DataFrame, features: Seq[String]): DataFrame =
    new VectorAssembler().setInputCols(features.toArray).setOutputCol("__fv")
      .transform(df.na.fill(0.0, features)).coalesce(4)

  /** Spark-ML Random Forest impurity importances. */
  object RandomForestRanker extends Ranker {
    val name = "random forest"
    def rank(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, seed: Long): Array[Double] = {
      val a = assemble(df, features)
      val imp = task match {
        case TaskKind.Classification =>
          new RandomForestClassifier().setFeaturesCol("__fv").setLabelCol(target)
            .setNumTrees(Estimator.FastTrees).setMaxDepth(Estimator.FastDepth).setMaxBins(Estimator.Bins)
            .setSeed(seed).fit(a).featureImportances
        case TaskKind.Regression =>
          new RandomForestRegressor().setFeaturesCol("__fv").setLabelCol(target)
            .setNumTrees(Estimator.FastTrees).setMaxDepth(Estimator.FastDepth).setMaxBins(Estimator.Bins)
            .setSeed(seed).fit(a).featureImportances
      }
      imp.toArray
    }
  }

  /** ℓ2,1 sparse regression (Eq. 1) row-norm ranking — the paper's second
    * ensemble member (§6.2). Runs on the collected coreset matrix.
    */
  final class SparseRegressionRanker(gamma: Double = 0.1,
                                     robustLabels: Boolean = false) extends Ranker {
    val name = "sparse regression"
    def rank(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, seed: Long): Array[Double] = {
      val local = MatrixOps.collect(df, features, target)
      MatrixOps.standardize(local.x)
      val yMat = SparseRegression.labelMatrix(local.y, task)
      SparseRegression.solve(local.x, yMat, gamma, robustLabels = robustLabels)
        .rowNorms.toArray
    }
  }

  /** Lasso (L1 linear regression) |coefficient| ranking; regression only
    * (Table 1 marks lasso n/a on classification datasets).
    */
  object LassoRanker extends Ranker {
    val name = "lasso"
    override def supports(task: TaskKind): Boolean = task == TaskKind.Regression
    def rank(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, seed: Long): Array[Double] = {
      val a = assemble(df, features)
      val m = new LinearRegression().setFeaturesCol("__fv").setLabelCol(target)
        .setElasticNetParam(1.0).setRegParam(0.02).setMaxIter(50).fit(a)
      m.coefficients.toArray.map(math.abs)
    }
  }

  /** L1 logistic regression |coefficient| ranking; classification only. */
  object LogisticRanker extends Ranker {
    val name = "logistic reg"
    override def supports(task: TaskKind): Boolean = task == TaskKind.Classification
    def rank(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, seed: Long): Array[Double] = {
      val a = assemble(df, features)
      val m = new LogisticRegression().setFeaturesCol("__fv").setLabelCol(target)
        .setElasticNetParam(1.0).setRegParam(0.01).setMaxIter(50).fit(a)
      val cm = m.coefficientMatrix
      Array.tabulate(features.length) { j =>
        (0 until cm.numRows).map(i => math.abs(cm(i, j))).sum
      }
    }
  }

  /** Linear SVC |coefficient| ranking (one-vs-rest beyond binary);
    * classification only.
    */
  object LinearSVCRanker extends Ranker {
    val name = "linear svc"
    override def supports(task: TaskKind): Boolean = task == TaskKind.Classification
    def rank(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, seed: Long): Array[Double] = {
      val a = assemble(df, features).withColumn(target, col(target).cast("double"))
      val nClasses = a.select(target).distinct().count().toInt
      val svc = new LinearSVC().setFeaturesCol("__fv").setLabelCol(target)
        .setRegParam(0.05).setMaxIter(30)
      if (nClasses <= 2) svc.fit(a).coefficients.toArray.map(math.abs)
      else {
        val ovr = new OneVsRest().setClassifier(svc)
          .setFeaturesCol("__fv").setLabelCol(target).fit(a)
        val out = Array.fill(features.length)(0.0)
        ovr.models.foreach { case m: LinearSVCModel =>
          val c = m.coefficients.toArray
          var j = 0
          while (j < out.length) { out(j) += math.abs(c(j)); j += 1 }
        }
        out
      }
    }
  }

  /** Mutual information over the melted layout (distributed). */
  object MutualInfoRanker extends Ranker {
    val name = "mutual info"
    def rank(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, seed: Long): Array[Double] =
      FilterStats.miScores(df, features, target, task)
  }

  /** F-test (ANOVA / regression F) over the melted layout (distributed,
    * via the FStatAgg UDAF for regression).
    */
  object FTestRanker extends Ranker {
    val name = "f-test"
    def rank(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, seed: Long): Array[Double] =
      FilterStats.fScores(df, features, target, task)
  }

  /** ReliefF / RReliefF weights over the collected coreset. */
  object ReliefRanker extends Ranker {
    val name = "relief"
    def rank(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, seed: Long): Array[Double] = {
      val local = MatrixOps.collect(df, features, target)
      Relief.weights(local.x, local.y, task, seed = seed).toArray
    }
  }

  val all: Seq[Ranker] = Seq(
    RandomForestRanker, new SparseRegressionRanker(), LassoRanker, LogisticRanker,
    LinearSVCRanker, MutualInfoRanker, FTestRanker, ReliefRanker)
}
