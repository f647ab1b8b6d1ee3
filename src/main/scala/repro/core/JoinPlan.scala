package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Join planning (§4): priority scoring of candidates, the Tuple-Ratio
  * prefilter of Kumar et al. [42], and table grouping into batches that
  * respect the feature budget.
  */
object JoinPlan {

  /** A candidate annotated with planning statistics. */
  final case class PlannedJoin(cand: CandidateJoin, score: Double,
                               nFeatures: Int, tupleRatio: Double)

  /** Multiple-option keys (§4): ARDA joins on each key option separately,
    * so expand every alternative into its own candidate.
    */
  def expandAlternatives(cands: Seq[CandidateJoin]): Seq[CandidateJoin] =
    cands.flatMap { c =>
      c +: c.altKeys.zipWithIndex.map { case (ks, i) =>
        c.copy(name = s"${c.name}__alt$i", keys = ks, altKeys = Nil)
      }
    }

  /** Intersection score: the fraction of distinct base hard-key tuples
    * that appear in the foreign table — computed with a distributed
    * semi-join. Pure soft-key candidates score 1.0 (a nearest-neighbour
    * join always matches something); the discovery system's own score, if
    * present, takes precedence (§4 "Table grouping").
    */
  def intersectionScore(base: DataFrame, cand: CandidateJoin): Double = {
    val hard = cand.keys.filter(_.kind == KeyKind.Hard)
    if (hard.isEmpty) 1.0
    else {
      val b = base.select(hard.map(k => col(k.baseCol)): _*).distinct()
      val f = cand.table.select(hard.map(k => col(k.foreignCol).as(k.baseCol)): _*).distinct()
      val total = b.count()
      if (total == 0) 0.0
      else b.join(f, hard.map(_.baseCol), "left_semi").count().toDouble / total
    }
  }

  /** Tuple Ratio (§7.3 / [42]): n_S / n_R with n_S = base-table rows and
    * n_R = the size of the foreign-key domain in the foreign table.
    */
  def tupleRatio(baseRows: Long, cand: CandidateJoin): Double = {
    val nR = cand.table
      .select(cand.keys.map(k => col(k.foreignCol)): _*)
      .distinct()
      .count()
    if (nR == 0) Double.PositiveInfinity else baseRows.toDouble / nR
  }

  /** Score and annotate all candidates against the base table. */
  def plan(base: DataFrame, cands: Seq[CandidateJoin]): Seq[PlannedJoin] = {
    val baseRows = base.count()
    expandAlternatives(cands).map { c =>
      val score = c.discoveryScore.getOrElse(intersectionScore(base, c))
      val nFeat = c.table.columns.count(col => !c.keys.exists(_.foreignCol == col))
      PlannedJoin(c, score, nFeat, tupleRatio(baseRows, c))
    }
  }

  /** TR-rule prefilter: drop tables whose tuple ratio is at least τ (the
    * decision rule of [42]: such joins are safe to avoid).
    */
  def trFilter(planned: Seq[PlannedJoin], tau: Double): Seq[PlannedJoin] =
    planned.filter(_.tupleRatio < tau)

  /** Group candidates into join batches (§4 "Table grouping"):
    *  - TableJoin: one table per batch, priority order;
    *  - BudgetJoin: as many tables per batch as fit `budget` features
    *    (a single table wider than the budget ships alone);
    *  - FullMaterialization: all tables in one batch.
    */
  def group(planned: Seq[PlannedJoin], strategy: GroupingStrategy,
            budget: Int): Seq[Seq[PlannedJoin]] = {
    val ordered = planned.sortBy(p => (-p.score, p.cand.name))
    strategy match {
      case GroupingStrategy.TableJoin           => ordered.map(Seq(_))
      case GroupingStrategy.FullMaterialization => if (ordered.isEmpty) Nil else Seq(ordered)
      case GroupingStrategy.BudgetJoin =>
        val batches = Seq.newBuilder[Seq[PlannedJoin]]
        var cur = Vector.empty[PlannedJoin]
        var used = 0
        for (p <- ordered) {
          if (p.nFeatures >= budget && cur.isEmpty) {
            batches += Seq(p) // wider than the budget: ships alone
          } else if (used + p.nFeatures > budget && cur.nonEmpty) {
            batches += cur
            cur = Vector(p); used = p.nFeatures
          } else {
            cur = cur :+ p; used += p.nFeatures
          }
        }
        if (cur.nonEmpty) batches += cur
        batches.result()
    }
  }
}
