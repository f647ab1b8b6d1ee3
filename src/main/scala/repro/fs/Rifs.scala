package repro.fs

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import scala.util.Random

import repro.core.TaskKind
import repro.ml.Estimator

/** Random Injection Feature Selection (§6, Algorithms 1–3).
  *
  * Noise features are injected next to the real ones; features that do not
  * consistently outrank *all* injected noise under an ensemble ranking
  * (Random Forest + ℓ2,1 sparse regression) are pruned. The injection
  * distribution is either a standard one (Gaussian / Uniform / Bernoulli /
  * Poisson) or — the default, for the hard regime where signal is a small
  * fraction of the input — a moment-matched N(µ,Σ) over the empirical
  * column distribution (Algorithm 2).
  *
  * Moment-matched samples are expressed as Catalyst column expressions:
  * with µ the per-row mean over feature columns and C_i = A_i − µ, the
  * sample µ + Σ_{i∈S} (g_i/√s)·C_i (S a random size-s subset, g ~ N(0,1))
  * has mean µ and covariance (1/d)·ΣC_iC_iᵀ in expectation — the empirical
  * moments — while keeping the expression tree small. No data is
  * collected to inject noise.
  */
object Rifs {

  sealed trait InjectKind
  object InjectKind {
    case object Gaussian      extends InjectKind
    case object Uniform       extends InjectKind
    case object Bernoulli     extends InjectKind
    case object Poisson       extends InjectKind
    case object MomentMatched extends InjectKind
  }

  final case class RifsConfig(
      eta: Double = 0.2,                  // fraction of injected features
      repeats: Int = 10,                  // k in Algorithm 1
      nu: Double = 0.5,                   // RF weight in the aggregate ranking
      thresholds: Seq[Double] = Seq(0.5, 0.7, 0.9, 1.0), // T in Algorithm 3
      inject: InjectKind = InjectKind.MomentMatched,
      sparsity: Int = 32,                 // s — nonzeros per moment-matched sample
      gamma: Double = 0.1,                // ℓ2,1 regularization
  )

  /** Algorithm 2 (+ standard-distribution variants): append `t` injected
    * noise columns named `__noise_<i>` and return (df, noiseCols).
    */
  def injectColumns(df: DataFrame, features: Seq[String], t: Int,
                    kind: InjectKind, sparsity: Int, seed: Long): (DataFrame, Seq[String]) = {
    val rnd = new Random(seed)
    val d = features.length
    val noiseCols = (0 until t).map(i => s"__noise_$i")
    val exprs: Seq[Column] = kind match {
      case InjectKind.Gaussian  => (0 until t).map(i => randn(seed + i))
      case InjectKind.Uniform   => (0 until t).map(i => rand(seed + i) * (rnd.nextDouble() * 4 + 1))
      case InjectKind.Bernoulli =>
        (0 until t).map { i =>
          val p = 0.2 + 0.6 * rnd.nextDouble()
          when(rand(seed + i) < p, 1.0).otherwise(0.0)
        }
      case InjectKind.Poisson =>
        // Inverse-CDF Poisson(λ∈[1,5]) via a when-chain over a fixed table.
        (0 until t).map { i =>
          val lam = 1.0 + 4.0 * rnd.nextDouble()
          val pmf = (0 to 14).scanLeft(math.exp(-lam)) { (p, k) => p * lam / (k + 1) }.tail
          val cdf = pmf.scanLeft(0.0)(_ + _).tail
          val u = rand(seed + i)
          cdf.zipWithIndex.foldRight(lit(15.0): Column) { case ((c, k), acc) =>
            when(u < c, k.toDouble).otherwise(acc)
          }
        }
      case InjectKind.MomentMatched =>
        val s = math.min(sparsity, d)
        // µ + Σ gᵢ(Aᵢ − µ) = µ·(1 − Σgᵢ) + Σ gᵢ·Aᵢ — reference a single
        // materialized row-mean column instead of inlining the d-term mean
        // expression into every product (which makes Catalyst analysis
        // quadratic in d·t).
        (0 until t).map { _ =>
          val subset = rnd.shuffle(features.toList).take(s)
          val scale = 1.0 / math.sqrt(s.toDouble)
          val gs = subset.map(f => f -> rnd.nextGaussian() * scale)
          val linear = gs.map { case (f, g) => col(f) * g }.reduce(_ + _)
          col("__rowmean") * (1.0 - gs.map(_._2).sum) + linear
        }
    }
    val withMean =
      if (kind == InjectKind.MomentMatched)
        df.withColumn("__rowmean", features.map(col(_)).reduce(_ + _) / d.toDouble)
      else df
    val out = withMean
      .select(withMean.columns.map(col).toSeq ++ noiseCols.zip(exprs).map { case (n, e) => e.as(n) }: _*)
      .drop("__rowmean")
    (out, noiseCols)
  }

  /** Rank-normalize scores to [0,1]: worst → 0, best → 1. */
  private def rankNormalize(scores: Array[Double]): Array[Double] = {
    val n = scores.length
    val order = scores.zipWithIndex.sortBy(_._1).map(_._2)
    val out = Array.fill(n)(0.0)
    order.zipWithIndex.foreach { case (idx, pos) => out(idx) = if (n == 1) 1.0 else pos.toDouble / (n - 1) }
    out
  }

  /** Algorithm 1: the fraction of repeats in which each feature outranks
    * *all* injected noise features under the aggregate (ν·RF + (1−ν)·SR)
    * ranking.
    */
  def noiseOutrankFractions(df: DataFrame, features: Seq[String], target: String,
                            task: TaskKind, cfg: RifsConfig, seed: Long): Array[Double] = {
    val d = features.length
    // At least 3 injected features: a single noise column is too weak a
    // baseline for the "ahead of ALL noise" test on small batches.
    val t = math.max(3, math.ceil(cfg.eta * d).toInt)
    val counts = Array.fill(d)(0.0)
    val sr = new Rankers.SparseRegressionRanker(cfg.gamma)
    for (rep <- 0 until cfg.repeats) {
      val (aug, noise) = injectColumns(df, features, t, cfg.inject, cfg.sparsity, seed + 1000L * rep)
      val allFeats = features ++ noise
      val rf  = rankNormalize(Rankers.RandomForestRanker.rank(aug, allFeats, target, task, seed + rep))
      val srS = rankNormalize(sr.rank(aug, allFeats, target, task, seed + rep))
      val agg = Array.tabulate(allFeats.length)(i => cfg.nu * rf(i) + (1 - cfg.nu) * srS(i))
      val maxNoise = (d until allFeats.length).map(agg).max
      var i = 0
      while (i < d) { if (agg(i) > maxNoise) counts(i) += 1.0; i += 1 }
    }
    counts.map(_ / cfg.repeats)
  }

  /** Algorithm 3: sweep thresholds in increasing order while the holdout
    * score stays monotone; on the first decrease output the previous
    * subset.
    */
  def select(df: DataFrame, features: Seq[String], target: String,
             task: TaskKind, cfg: RifsConfig = RifsConfig(), seed: Long = 31L): Seq[String] = {
    if (features.isEmpty) return Nil
    val rStar = noiseOutrankFractions(df, features, target, task, cfg, seed)
    // Before any threshold is accepted, an empty first subset means no
    // feature ever outranked the noise — prune everything.
    var prevSubset: Seq[String] = Nil
    var prevScore = Double.MinValue
    for (tau <- cfg.thresholds.sorted) {
      val s = features.zip(rStar).collect { case (f, r) if r >= tau => f }
      if (s.isEmpty) return prevSubset
      val score = Estimator.holdoutScore(df, s, target, task, seed)
      if (score < prevScore) return prevSubset
      prevSubset = s; prevScore = score
    }
    prevSubset
  }
}
