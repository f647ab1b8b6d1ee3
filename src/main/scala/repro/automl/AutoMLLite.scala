package repro.automl

import org.apache.spark.ml.classification.{GBTClassifier, LogisticRegression, RandomForestClassifier}
import org.apache.spark.ml.feature.VectorAssembler
import org.apache.spark.ml.regression.{GBTRegressor, LinearRegression, RandomForestRegressor}
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.TaskKind
import repro.ml.Estimator

/** Substitute for the closed AutoML systems the paper compares against
  * (Microsoft Azure AutoML, Alpine Meadow): a time-budgeted sequential
  * model + hyperparameter search over Spark-ML Random Forests, gradient
  * boosted trees and linear models. Plays the same role in Tables 1/6 —
  * an expensive estimator run directly on the base table ("baseline") or
  * on the fully-materialized join ("all features"), with no ARDA
  * selection in the loop. Documented in DESIGN.md.
  */
object AutoMLLite {

  /** Best holdout score found within `budgetSeconds` (accuracy, or −MAE). */
  def search(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, budgetSeconds: Double = 45.0, seed: Long = 17L): Double = {
    if (features.isEmpty) return Double.MinValue
    val (tr0, te0) = Estimator.split(df, seed)
    val assembler = new VectorAssembler().setInputCols(features.toArray).setOutputCol("__fv")
    val tr = assembler.transform(tr0.na.fill(0.0, features)).coalesce(4).cache()
    val te = assembler.transform(te0.na.fill(0.0, features)).coalesce(4).cache()
    tr.count(); te.count()

    val deadline = System.nanoTime() + (budgetSeconds * 1e9).toLong
    val nClasses = task match {
      case TaskKind.Classification => tr.select(target).distinct().count().toInt
      case TaskKind.Regression     => 0
    }

    def candidates: Seq[() => Double] = task match {
      case TaskKind.Classification =>
        val rf = for ((t, d) <- Seq((40, 6), (80, 8), (120, 8))) yield { () =>
          val m = new RandomForestClassifier().setFeaturesCol("__fv").setLabelCol(target)
            .setPredictionCol("__p").setNumTrees(t).setMaxDepth(d).setMaxBins(Estimator.Bins).setSeed(seed).fit(tr)
          Estimator.accuracy(m.transform(te), target, "__p")
        }
        val lr = Seq(0.0, 0.01).map { r => () =>
          val m = new LogisticRegression().setFeaturesCol("__fv").setLabelCol(target)
            .setPredictionCol("__p").setRegParam(r).setMaxIter(60).fit(tr)
          Estimator.accuracy(m.transform(te), target, "__p")
        }
        // GBT is binary-only in Spark ML.
        val gbt = if (nClasses == 2) Seq(15).map { it => () =>
          val m = new GBTClassifier().setFeaturesCol("__fv").setLabelCol(target)
            .setPredictionCol("__p").setMaxIter(it).setMaxDepth(5).setMaxBins(Estimator.Bins).setSeed(seed).fit(tr)
          Estimator.accuracy(m.transform(te), target, "__p")
        } else Nil
        rf ++ lr ++ gbt
      case TaskKind.Regression =>
        val rf = for ((t, d) <- Seq((40, 6), (80, 8), (120, 8))) yield { () =>
          val m = new RandomForestRegressor().setFeaturesCol("__fv").setLabelCol(target)
            .setPredictionCol("__p").setNumTrees(t).setMaxDepth(d).setMaxBins(Estimator.Bins).setSeed(seed).fit(tr)
          -Estimator.mae(m.transform(te), target, "__p")
        }
        val lin = Seq(0.0, 0.01).map { r => () =>
          val m = new LinearRegression().setFeaturesCol("__fv").setLabelCol(target)
            .setPredictionCol("__p").setRegParam(r).setMaxIter(60).fit(tr)
          -Estimator.mae(m.transform(te), target, "__p")
        }
        val gbt = Seq(15).map { it => () =>
          val m = new GBTRegressor().setFeaturesCol("__fv").setLabelCol(target)
            .setPredictionCol("__p").setMaxIter(it).setMaxDepth(5).setMaxBins(Estimator.Bins).setSeed(seed).fit(tr)
          -Estimator.mae(m.transform(te), target, "__p")
        }
        rf ++ lin ++ gbt
    }

    var best = Double.MinValue
    val it = candidates.iterator
    var ran = 0
    while (it.hasNext && (ran == 0 || System.nanoTime() < deadline)) {
      best = math.max(best, it.next()())
      ran += 1
    }
    tr.unpersist(false); te.unpersist(false)
    best
  }
}
