package repro.baselines

import repro.core.{ConfigSpace, PairDist}
import repro.eval.Metrics.Scored

/** Distance-table-backed baselines: the Best Static Join function (BSJ)
  * and the recall Upper Bound (UBR) of §5.1.3. Both reuse the 140-function
  * distance vectors AutoFJ computes over the blocked candidate pairs.
  */
object StaticBaselines {

  /** Scored predictions of a single static join function: each right
    * record's closest left candidate under `fid` (score = -distance).
    */
  def scoredForFunction(lrPairs: Array[PairDist], fid: Int): Vector[Scored] = {
    val best = scala.collection.mutable.HashMap.empty[Long, (Long, Float)]
    lrPairs.foreach { p =>
      val d = p.d(fid)
      best.get(p.rightId) match {
        case Some((l, bd)) if bd < d || (bd == d && l <= p.leftId) => ()
        case _ => best(p.rightId) = (p.leftId, d)
      }
    }
    best.iterator.map { case (r, (l, d)) => Scored(r, l, -d.toDouble) }.toVector.sortBy(_.rId)
  }

  /** UBR: a ground-truth pair (l, r) is *feasible* if some configuration
    * makes l the closest left record to r; UBR is the fraction of
    * feasible ground-truth pairs (the best any fuzzy-join program over
    * the space could do).
    */
  def upperBoundRecall(lrPairs: Array[PairDist], gt: Map[Long, Long], gtTotal: Int): Double = {
    if (gtTotal == 0) return 0.0
    val byR = lrPairs.groupBy(_.rightId)
    var feasible = 0
    gt.foreach { case (rId, lId) =>
      byR.get(rId).foreach { pairs =>
        val gtPair = pairs.find(_.leftId == lId)
        gtPair.foreach { gp =>
          var f = 0
          var ok = false
          while (f < ConfigSpace.Size && !ok) {
            var minD = Float.MaxValue
            var i = 0
            while (i < pairs.length) {
              if (pairs(i).d(f) < minD) minD = pairs(i).d(f)
              i += 1
            }
            if (gp.d(f) <= minD) ok = true
            f += 1
          }
          if (ok) feasible += 1
        }
      }
    }
    feasible.toDouble / gtTotal
  }
}
