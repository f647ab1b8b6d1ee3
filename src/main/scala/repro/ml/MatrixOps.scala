package repro.ml

import breeze.linalg.{DenseMatrix, DenseVector}
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Bridge between DataFrames and driver-local Breeze matrices.
  *
  * Solver-style components (ℓ2,1 sparse regression, Relief) run on the
  * driver over the *coreset* — the coreset exists precisely to make these
  * cheap (§3.1) — so collecting here is by design, not an accident.
  */
object MatrixOps {

  /** A collected design matrix: rows × features, plus the target vector. */
  final case class LocalData(x: DenseMatrix[Double], y: DenseVector[Double],
                             features: Seq[String])

  /** Collect `features` and `target` of `df` into local matrices; nulls
    * (which Preprocess should have removed) default to 0.
    */
  def collect(df: DataFrame, features: Seq[String], target: String): LocalData = {
    val rows = df.select((features :+ target).map(c => col(c).cast("double")): _*).collect()
    val n = rows.length; val d = features.length
    val x = DenseMatrix.zeros[Double](n, d)
    val y = DenseVector.zeros[Double](n)
    var i = 0
    while (i < n) {
      val r = rows(i)
      var j = 0
      while (j < d) { x(i, j) = if (r.isNullAt(j)) 0.0 else r.getDouble(j); j += 1 }
      y(i) = if (r.isNullAt(d)) 0.0 else r.getDouble(d)
      i += 1
    }
    LocalData(x, y, features)
  }

  /** Column-standardize in place: zero mean, unit variance (constant
    * columns become all-zero). Returns the input for chaining.
    */
  def standardize(m: DenseMatrix[Double]): DenseMatrix[Double] = {
    val n = m.rows
    var j = 0
    while (j < m.cols) {
      var s = 0.0; var s2 = 0.0
      var i = 0
      while (i < n) { val v = m(i, j); s += v; s2 += v * v; i += 1 }
      val mean = s / n
      val sd = math.sqrt(math.max(1e-12, s2 / n - mean * mean))
      i = 0
      while (i < n) { m(i, j) = (m(i, j) - mean) / sd; i += 1 }
      j += 1
    }
    m
  }
}
