package repro.eval

import repro.lake.{GroundTruth, Lake}

/** Effectiveness measures exactly as defined in §V-A (precision/recall over
  * the top-k with table-level TP = ≥1 truly related attribute) and §V-E
  * (coverage Eq. 4/5, attribute precision). All operate on collected
  * (driver-side) rankings/alignments — rankings are tiny (targets × tables).
  */
object Metrics {

  /** One ranked candidate: target, candidate, 1-based rank. */
  final case class Ranked(tTable: String, sTable: String, rank: Int)

  /** One discovered attribute alignment. */
  final case class Align(tTable: String, tCol: Int, sTable: String, sCol: Int)

  /** Mean precision/recall at k over all targets that have ≥1 related table
    * in the ground truth. Precision counts only what was returned (if fewer
    * than k candidates were retrieved, the denominator is what exists —
    * matching p = TP/(TP+FP)).
    */
  def precisionRecallAtK(ranks: Seq[Ranked], truth: GroundTruth, k: Int): (Double, Double) = {
    val byTarget = ranks.groupBy(_.tTable)
    val perTarget = byTarget.toSeq.sortBy(_._1).flatMap { case (t, rs) =>
      val related = truth.relatedTables.getOrElse(t, Set.empty)
      if (related.isEmpty) None
      else {
        val retrieved = rs.filter(_.rank <= k).map(_.sTable).toSet
        val tp = retrieved.count(related.contains)
        val p = if (retrieved.isEmpty) 0.0 else tp.toDouble / retrieved.size
        val r = tp.toDouble / related.size
        Some((p, r))
      }
    }
    if (perTarget.isEmpty) (0.0, 0.0)
    else (perTarget.map(_._1).sum / perTarget.size, perTarget.map(_._2).sum / perTarget.size)
  }

  private def topK(ranks: Seq[Ranked], t: String, k: Int): Seq[String] =
    ranks.filter(r => r.tTable == t && r.rank <= k).sortBy(_.rank).map(_.sTable)

  /** Eq. 4 averaged: mean over targets and over S_i ∈ top-k of the fraction
    * of target attributes aligned with some attribute of S_i. With
    * `reachableOf` (the join-path extension), S_i's coverage is that of the
    * union of its join-path tables (Eq. 5).
    */
  def meanCoverage(ranks: Seq[Ranked], aligns: Seq[Align], lake: Lake, k: Int,
                   reachableOf: (String, String) => Set[String] = (_, _) => Set.empty): Double = {
    val alignsBy = aligns.groupBy(a => (a.tTable, a.sTable))
    val targets = ranks.map(_.tTable).distinct.sorted
    val per = targets.flatMap { t =>
      val arity = lake.table(t).arity
      val tk = topK(ranks, t, k)
      if (tk.isEmpty || arity == 0) None
      else Some(tk.map { si =>
        val tables = Set(si) ++ reachableOf(t, si)
        val covered = tables.flatMap(s => alignsBy.getOrElse((t, s), Nil).map(_.tCol))
        covered.size.toDouble / arity
      }.sum / tk.size)
    }
    if (per.isEmpty) 0.0 else per.sum / per.size
  }

  /** §V-E attribute precision, join-unaware: per S_i, each discovered
    * alignment is a TP iff the attribute pair is related in the truth; mean
    * over S_i with ≥1 alignment, then over targets.
    */
  def meanAttrPrecision(ranks: Seq[Ranked], aligns: Seq[Align], truth: GroundTruth, k: Int): Double = {
    val alignsBy = aligns.groupBy(a => (a.tTable, a.sTable))
    val targets = ranks.map(_.tTable).distinct.sorted
    val per = targets.flatMap { t =>
      val tk = topK(ranks, t, k)
      val scores = tk.flatMap { si =>
        val as = alignsBy.getOrElse((t, si), Nil)
        if (as.isEmpty) None
        else {
          val tp = as.count(a => truth.attrsRelated(t, a.tCol, si, a.sCol))
          Some(tp.toDouble / as.size)
        }
      }
      if (scores.isEmpty) None else Some(scores.sum / scores.size)
    }
    if (per.isEmpty) 0.0 else per.sum / per.size
  }

  /** §V-E attribute precision with join paths: per S_i, for every target
    * attribute covered by S_i's join-path table set, the *group* of aligned
    * attributes counts as one TP iff it contains ≥1 truly related member.
    */
  def meanAttrPrecisionJoined(ranks: Seq[Ranked], aligns: Seq[Align], truth: GroundTruth,
                              k: Int, reachableOf: (String, String) => Set[String]): Double = {
    val alignsBy = aligns.groupBy(a => (a.tTable, a.sTable))
    val targets = ranks.map(_.tTable).distinct.sorted
    val per = targets.flatMap { t =>
      val tk = topK(ranks, t, k)
      val scores = tk.flatMap { si =>
        val tables = Set(si) ++ reachableOf(t, si)
        val groups = tables.toSeq.flatMap(s => alignsBy.getOrElse((t, s), Nil))
          .groupBy(_.tCol)
        if (groups.isEmpty) None
        else {
          val tp = groups.count { case (_, as) =>
            as.exists(a => truth.attrsRelated(t, a.tCol, a.sTable, a.sCol))
          }
          Some(tp.toDouble / groups.size)
        }
      }
      if (scores.isEmpty) None else Some(scores.sum / scores.size)
    }
    if (per.isEmpty) 0.0 else per.sum / per.size
  }
}
