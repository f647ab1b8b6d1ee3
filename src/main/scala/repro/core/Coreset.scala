package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Coreset constructions (§3.1): uniform sampling, stratified sampling
  * (per label, for classification), and an OSNAP-style count-sketch of
  * rows. Sampling runs *before* joins (rows keep their key values);
  * sketching mixes row values and therefore only runs *after* the join
  * (see [[sketch]]), per the paper.
  */
object Coreset {

  /** Uniformly sample ~`size` rows (exact cap via limit after sample). */
  def uniform(df: DataFrame, size: Int, seed: Long): DataFrame = {
    val n = df.count()
    if (n <= size) df
    else {
      // Oversample slightly then cap, so the coreset size is deterministic.
      val frac = math.min(1.0, size.toDouble / n * 1.2)
      df.sample(withReplacement = false, frac, seed).limit(size)
    }
  }

  /** Stratified sample: partition by `target` label and sample each
    * stratum at the same rate, so no label is overlooked (§3.1).
    */
  def stratified(df: DataFrame, target: String, size: Int, seed: Long): DataFrame = {
    val n = df.count()
    if (n <= size) df
    else {
      val frac = math.min(1.0, size.toDouble / n * 1.2)
      val labels = df.select(col(target)).distinct().collect().map(_.get(0))
      val fractions = labels.map(l => l -> frac).toMap
      df.stat.sampleBy(target, fractions, seed).limit(size)
    }
  }

  /** Dispatch for pre-join strategies; Sketch falls back to uniform here
    * because sketching is applied post-join (§3.1).
    */
  def build(df: DataFrame, target: String, task: TaskKind, cfg: ArdaConfig): DataFrame =
    cfg.coresetStrategy match {
      case CoresetStrategy.Stratified if task == TaskKind.Classification =>
        stratified(df, target, cfg.coresetSize, cfg.seed)
      case _ =>
        uniform(df, cfg.coresetSize, cfg.seed)
    }

  /** OSNAP / count-sketch of rows (Definitions 1–2): every row is hashed
    * to one of `rows` buckets with a random ±1 sign and bucket sums are
    * taken per feature — a sparse Π with one nonzero per column of Πᵀ.
    * For classification the sketch is applied independently within each
    * label stratum (the paper's analogue of stratified sampling), so the
    * sketched rows carry a well-defined label. For regression the target
    * column is sketched alongside the features.
    *
    * Expressed as a single groupBy aggregation — the natural distributed
    * form of S·A.
    */
  def sketch(df: DataFrame, features: Seq[String], target: String, task: TaskKind,
             rows: Int, seed: Long): DataFrame = {
    // `rows` is the total sketch size; per-stratum sketches split it
    // across the labels so classification output is still ~`rows` rows.
    val perBucket = task match {
      case TaskKind.Classification =>
        val k = df.select(col(target)).distinct().count().toInt
        math.max(2, rows / math.max(1, k))
      case TaskKind.Regression => rows
    }
    val bucket = (rand(seed) * perBucket).cast(IntegerType)
    val sign   = when(rand(seed + 1) < 0.5, -1.0).otherwise(1.0)
    val tagged = df.withColumn("__bkt", bucket).withColumn("__sgn", sign)
    val sums   = features.map(c => sum(col("__sgn") * col(c).cast(DoubleType)).as(c))
    task match {
      case TaskKind.Classification =>
        // Per-stratum sketch: group by (label, bucket); label survives.
        tagged.groupBy(col(target), col("__bkt"))
          .agg(sums.head, sums.tail: _*)
          .drop("__bkt")
      case TaskKind.Regression =>
        val t = sum(col("__sgn") * col(target).cast(DoubleType)).as(target)
        tagged.groupBy(col("__bkt"))
          .agg(t, sums: _*)
          .drop("__bkt")
    }
  }
}
