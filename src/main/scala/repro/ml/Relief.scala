package repro.ml

import breeze.linalg.{DenseMatrix, DenseVector}
import scala.util.Random

import repro.core.TaskKind

/** Relief-family feature weighting (§5 baseline): ReliefF for
  * classification and RReliefF for regression, run on the driver over the
  * coreset matrix. O(m·n·d) with m sampled anchor instances and k nearest
  * neighbours; distances use range-normalized Manhattan diff as in the
  * original algorithms.
  */
object Relief {

  /** Feature weights; higher = more relevant. */
  def weights(x: DenseMatrix[Double], y: DenseVector[Double], task: TaskKind,
              m: Int = 150, k: Int = 5, seed: Long = 23L): DenseVector[Double] = task match {
    case TaskKind.Classification => reliefF(x, y, m, k, seed)
    case TaskKind.Regression     => rreliefF(x, y, m, k, seed)
  }

  private def ranges(x: DenseMatrix[Double]): Array[Double] =
    Array.tabulate(x.cols) { j =>
      var lo = Double.MaxValue; var hi = Double.MinValue
      var i = 0
      while (i < x.rows) { val v = x(i, j); if (v < lo) lo = v; if (v > hi) hi = v; i += 1 }
      math.max(1e-12, hi - lo)
    }

  private def dist(x: DenseMatrix[Double], a: Int, b: Int, rng: Array[Double]): Double = {
    var s = 0.0
    var j = 0
    while (j < x.cols) { s += math.abs(x(a, j) - x(b, j)) / rng(j); j += 1 }
    s
  }

  /** k nearest indices to `a` among rows satisfying `pred` (excluding a). */
  private def nearest(x: DenseMatrix[Double], a: Int, k: Int, rng: Array[Double],
                      pred: Int => Boolean): Array[Int] = {
    val cand = (0 until x.rows).filter(i => i != a && pred(i))
    cand.sortBy(i => dist(x, a, i, rng)).take(k).toArray
  }

  /** ReliefF (Kononenko): hits pull weights down, misses (weighted by
    * class prior renormalized over the complement) push them up.
    */
  def reliefF(x: DenseMatrix[Double], y: DenseVector[Double],
              m: Int, k: Int, seed: Long): DenseVector[Double] = {
    val n = x.rows; val d = x.cols
    val rng = ranges(x)
    val w = DenseVector.zeros[Double](d)
    val classes = y.toArray.distinct.sorted
    val prior = classes.map(c => c -> y.toArray.count(_ == c).toDouble / n).toMap
    val rand = new Random(seed)
    val anchors = Array.fill(math.min(m, n))(rand.nextInt(n))
    for (a <- anchors) {
      val ca = y(a)
      val hits = nearest(x, a, k, rng, i => y(i) == ca)
      for (h <- hits; j <- 0 until d)
        w(j) -= math.abs(x(a, j) - x(h, j)) / rng(j) / (anchors.length * math.max(1, hits.length))
      for (c <- classes if c != ca) {
        val misses = nearest(x, a, k, rng, i => y(i) == c)
        val pw = prior(c) / math.max(1e-12, 1.0 - prior(ca))
        for (ms <- misses; j <- 0 until d)
          w(j) += pw * math.abs(x(a, j) - x(ms, j)) / rng(j) / (anchors.length * math.max(1, misses.length))
      }
    }
    w
  }

  /** RReliefF (Robnik-Šikonja & Kononenko): probabilistic formulation for
    * a numeric target via accumulators N_dC, N_dA[j], N_dC∧dA[j].
    */
  def rreliefF(x: DenseMatrix[Double], y: DenseVector[Double],
               m: Int, k: Int, seed: Long): DenseVector[Double] = {
    val n = x.rows; val d = x.cols
    val rng = ranges(x)
    val yLo = y.toArray.min; val yHi = y.toArray.max
    val yRange = math.max(1e-12, yHi - yLo)
    var nDC = 0.0
    val nDA = Array.fill(d)(0.0)
    val nDCDA = Array.fill(d)(0.0)
    val rand = new Random(seed)
    val anchors = Array.fill(math.min(m, n))(rand.nextInt(n))
    for (a <- anchors) {
      val nbrs = nearest(x, a, k, rng, _ => true)
      for (b <- nbrs) {
        val dY = math.abs(y(a) - y(b)) / yRange
        nDC += dY
        var j = 0
        while (j < d) {
          val dA = math.abs(x(a, j) - x(b, j)) / rng(j)
          nDA(j) += dA
          nDCDA(j) += dY * dA
          j += 1
        }
      }
    }
    val total = anchors.length.toDouble * k
    DenseVector.tabulate(d) { j =>
      if (nDC < 1e-12 || total - nDC < 1e-12) 0.0
      else nDCDA(j) / nDC - (nDA(j) - nDCDA(j)) / (total - nDC)
    }
  }
}
