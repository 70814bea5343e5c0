package repro.core

import org.apache.spark.sql.SparkSession
import scala.concurrent.{Await, ExecutionContext, Future}
import scala.concurrent.duration.Duration
import repro.data.MultiTask

/** §4: multi-column AutoFJ — Algorithm 3 (forward selection over columns
  * with linear weight blending) on top of the single-column greedy search.
  *
  * Blocking runs once on the concatenation of all columns; per-column
  * distance tables are computed in one Spark pass each and aligned by
  * pair index; candidate weight vectors are evaluated concurrently on the
  * driver (the search is pure).
  */
object MultiColumnAutoFJ {

  /** Prepared multi-column task: aligned per-column distance tables. */
  final case class PreparedMulti(
      columns: Vector[String],
      lrCols: Array[Array[PairDist]],
      llCols: Array[Array[PairDist]],
  )

  final case class MultiResult(
      result: AutoFJ.Result,
      weights: Array[Double],
      selected: Vector[Int],
  )

  /** Block on concatenated columns and compute one aligned distance table
    * per column.
    */
  def prepare(spark: SparkSession, task: MultiTask, beta: Double = 1.0): PreparedMulti = {
    val m = task.nCols
    val lConcat = task.left.map { case (id, v) => (id, v.mkString(" ")) }
    val rConcat = task.right.map { case (id, v) => (id, v.mkString(" ")) }
    val dfL = SingleColumnPipeline.toDF(spark, lConcat)
    val dfR = SingleColumnPipeline.toDF(spark, rConcat)
    val (lrCand, llCand) = Blocking.block(spark, dfL, dfR, beta)
    // Fixed pair order shared by every column's distance pass.
    val lrPairs = lrCand.select("leftId", "rightId").collect()
      .map(r => (r.getLong(0), r.getLong(1))).sorted.toSeq
    val llPairs = llCand.select("leftId", "rightId").collect()
      .map(r => (r.getLong(0), r.getLong(1))).sorted.toSeq
    val lrDf = SingleColumnPipeline.toPairDF(spark, lrPairs)
    val llDf = SingleColumnPipeline.toPairDF(spark, llPairs)

    val lPrepped = task.left.map { case (id, v) => id -> v.map(Prepped(_)).toArray }.toMap
    val rPrepped = task.right.map { case (id, v) => id -> v.map(Prepped(_)).toArray }.toMap
    val ctxs = Array.tabulate(m)(c =>
      FeatureContext.build(lPrepped.values.map(_(c)) ++ rPrepped.values.map(_(c))))
    // Re-sort each column identically: collect() order is not guaranteed
    // across jobs, and SearchData.fromColumns needs index alignment.
    val lrCols = DistanceTable.computeMulti(spark, lrDf, lPrepped, rPrepped, ctxs)
      .map(_.sortBy(p => (p.leftId, p.rightId)))
    val llCols = DistanceTable.computeMulti(spark, llDf, lPrepped, lPrepped, ctxs)
      .map(_.sortBy(p => (p.leftId, p.rightId)))
    PreparedMulti(task.columns, lrCols, llCols)
  }

  /** Algorithm 3. Weight vectors are kept normalized to sum 1 (the blend
    * (1-α)w + αe_j preserves the sum), so combined distances stay in the
    * [0, 1] range of the shared threshold grid. Candidate columns are
    * ranked by *estimated* recall (TP), which needs no labels.
    *
    * @param selectionFids when set, the O(m²g) weight-vector evaluations of
    *                      the forward selection run over this (smaller)
    *                      function subset; the final program is still
    *                      searched over the full `fids`. Column importance
    *                      is a static property of the data (§4.2's
    *                      Observation 2), so ranking columns on a surrogate
    *                      space preserves the selection while cutting the
    *                      dominant cost ~6x.
    */
  def run(
      prepared: PreparedMulti,
      tau: Double,
      fids: Array[Int] = ConfigSpace.full.map(_.id).toArray,
      steps: Int = 50,
      g: Int = 10,
      gt: Map[Long, Long] = Map.empty,
      gtTotal: Int = 0,
      selectionFids: Option[Array[Int]] = None,
  ): MultiResult = {
    val m = prepared.columns.length
    val thetas = ConfigSpace.thresholds(steps)
    implicit val ec: ExecutionContext = ExecutionContext.global
    val selFids = selectionFids.getOrElse(fids)

    def runSearch(w: Array[Double]): AutoFJ.Result = {
      val data = SearchData.fromColumns(prepared.lrCols, prepared.llCols, selFids, w)
      AutoFJ.search(data, thetas, tau, gt, gtTotal)
    }

    var w = Array.fill(m)(0.0)
    var remaining = (0 until m).toSet
    var bestResult: AutoFJ.Result = null
    var bestRecall = Double.NegativeInfinity
    var selected = Vector.empty[Int]
    var continue = true

    while (continue && remaining.nonEmpty) {
      val isFirst = w.forall(_ == 0.0)
      val candidates: Seq[(Int, Array[Double])] =
        if (isFirst) remaining.toSeq.sorted.map { j =>
          val w2 = Array.fill(m)(0.0); w2(j) = 1.0; (j, w2)
        }
        else for {
          j <- remaining.toSeq.sorted
          a <- 1 until g
        } yield {
          val alpha = a.toDouble / g
          val w2 = Array.tabulate(m)(i => (1 - alpha) * w(i) + (if (i == j) alpha else 0.0))
          (j, w2)
        }
      val futures = candidates.map { case (j, w2) =>
        Future((j, w2, runSearch(w2)))
      }
      val evaluated = Await.result(Future.sequence(futures), Duration.Inf)
      val (bj, bw, br) = evaluated.maxBy { case (j, _, r) => (r.estTP, -j) }
      if (br.estTP > bestRecall) {
        bestRecall = br.estTP
        bestResult = br
        w = bw
        selected = selected :+ bj
        remaining -= bj
      } else continue = false
    }

    // Final program: full function space under the selected weights.
    val finalResult =
      if (selFids.sameElements(fids)) bestResult
      else {
        val data = SearchData.fromColumns(prepared.lrCols, prepared.llCols, fids, w)
        AutoFJ.search(data, thetas, tau, gt, gtTotal)
      }
    MultiResult(finalResult, w, selected)
  }
}
