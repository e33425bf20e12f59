package repro.core

/** Linkage accuracy metrics (paper §5).
  *
  * Ground truth is a one-to-one mapping from dataset-E entity ids to
  * dataset-I entity ids (in the synthetic setup, the shared entity ids that
  * survive both samples).
  */
object Metrics {

  final case class Prf(precision: Double, recall: Double, f1: Double,
                       tp: Int, fp: Int, fn: Int)

  /** Precision/recall/F1 of predicted links against the truth mapping.
    * Precision over emitted links; recall over linkable truth pairs.
    */
  def prf(links: Seq[(Long, Long)], truth: Map[Long, Long]): Prf = {
    val tp = links.count { case (u, v) => truth.get(u).contains(v) }
    val fp = links.size - tp
    val fn = truth.size - tp
    val p = if (links.isEmpty) 0.0 else tp.toDouble / links.size
    val r = if (truth.isEmpty) 0.0 else tp.toDouble / truth.size
    val f1 = if (p + r <= 0) 0.0 else 2 * p * r / (p + r)
    Prf(p, r, f1, tp, fp, fn)
  }

  /** Hit-Precision@k (paper §5.5, after Riederer et al.): for each pivot
    * entity `u`, rank its true partner in `u`'s similarity-sorted candidate
    * list (0-based; ties break by vid for determinism) and credit
    * `max(0, 1 - rank/k)`; entities without a true partner, or whose partner
    * is unscored or ranked past k, credit 0. Averaged over *all* pivot
    * entities — with intersection ratio 0.5 the best achievable value is 0.5,
    * as in the paper.
    */
  def hitPrecisionAtK(scores: Map[(Long, Long), Double], pivotEntities: Seq[Long],
                      truth: Map[Long, Long], k: Int): Double = {
    require(k > 0)
    if (pivotEntities.isEmpty) return 0.0
    val byU = scores.toSeq.map { case ((u, v), s) => (u, v, s) }.groupBy(_._1)
    val hits = pivotEntities.map { u =>
      truth.get(u) match {
        case None => 0.0
        case Some(v) =>
          val ranked = byU.getOrElse(u, Nil).sortBy(t => (-t._3, t._2)).map(_._2)
          val rank = ranked.indexOf(v)
          if (rank < 0) 0.0 else math.max(0.0, 1.0 - rank.toDouble / k)
      }
    }
    hits.sum / pivotEntities.size
  }
}
