package repro.core

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

/** End-to-end single-column AutoFJ pipeline (§3): blocking, negative rules,
  * distance tables (Spark), then the greedy search (driver).
  */
object SingleColumnPipeline {

  /** Everything the search and the baselines consume, computed once per
    * (L, R) task: prepped records, candidate pairs with full distance
    * vectors (both pre- and post-negative-rule filtering), and the learned
    * rules.
    */
  final case class Prepared(
      lText: Map[Long, String],
      rText: Map[Long, String],
      lPrepped: Map[Long, Prepped],
      rPrepped: Map[Long, Prepped],
      ctx: FeatureContext,
      lrAll: Array[PairDist],
      lrFiltered: Array[PairDist],
      llPairs: Array[PairDist],
      rules: Set[NegativeRules.Rule],
      blockSim: Map[(Long, Long), Double],
  )

  private val recSchema = StructType(Seq(
    StructField("id", LongType, nullable = false),
    StructField("text", StringType, nullable = true),
  ))

  /** (id, text) pairs as a DataFrame with the blocking-ready schema. */
  def toDF(spark: SparkSession, recs: Seq[(Long, String)]): DataFrame =
    spark.createDataFrame(
      spark.sparkContext.parallelize(recs.map { case (id, t) => Row(id, t) }, 8),
      recSchema)

  def prepare(
      spark: SparkSession,
      left: Seq[(Long, String)],
      right: Seq[(Long, String)],
      beta: Double = 1.0,
  ): Prepared = {
    val dfL = toDF(spark, left)
    val dfR = toDF(spark, right)
    val (lrCand, llCand) = Blocking.block(spark, dfL, dfR, beta)
    val lrRows = lrCand.collect().map(r => (r.getLong(0), r.getLong(1), r.getDouble(2)))
    val llRows = llCand.select("leftId", "rightId").collect().map(r => (r.getLong(0), r.getLong(1)))

    val lText = left.toMap
    val rText = right.toMap

    // Negative rules: learned from L–L survivors, applied to L–R survivors.
    val rules = NegativeRules.learn(llRows.iterator.map { case (a, b) => (lText(a), lText(b)) }.toSeq)

    val lPrepped = left.map { case (id, t) => id -> Prepped(t) }.toMap
    val rPrepped = right.map { case (id, t) => id -> Prepped(t) }.toMap
    val ctx = FeatureContext.build(lPrepped.values ++ rPrepped.values)

    val lrPairDf = toPairDF(spark, lrRows.map(t => (t._1, t._2)))
    val llPairDf = toPairDF(spark, llRows)
    val lrAll = DistanceTable.compute(spark, lrPairDf, lPrepped, rPrepped, ctx)
    val llPairs = DistanceTable.compute(spark, llPairDf, lPrepped, lPrepped, ctx)
    val lrFiltered = lrAll.filterNot(p => NegativeRules.violates(rules, lText(p.leftId), rText(p.rightId)))

    Prepared(lText, rText, lPrepped, rPrepped, ctx, lrAll, lrFiltered, llPairs, rules,
             lrRows.map(t => (t._1, t._2) -> t._3).toMap)
  }

  private val pairSchema = StructType(Seq(
    StructField("leftId", LongType, nullable = false),
    StructField("rightId", LongType, nullable = false),
  ))

  def toPairDF(spark: SparkSession, pairs: Seq[(Long, Long)]): DataFrame =
    spark.createDataFrame(
      spark.sparkContext.parallelize(pairs.map { case (a, b) => Row(a, b) }, 8),
      pairSchema)

  /** Run AutoFJ (Algorithm 1) over a prepared task.
    *
    * @param fids          function ids searched (full 140 or reduced 24)
    * @param negativeRules false reproduces the AutoFJ-NR ablation
    * @param gt / gtTotal  evaluation-only: enables the actual-P/R trace
    */
  def autoFJ(
      prepared: Prepared,
      tau: Double,
      fids: Array[Int] = ConfigSpace.full.map(_.id).toArray,
      steps: Int = 50,
      negativeRules: Boolean = true,
      gt: Map[Long, Long] = Map.empty,
      gtTotal: Int = 0,
  ): AutoFJ.Result = {
    val lr = if (negativeRules) prepared.lrFiltered else prepared.lrAll
    val data = SearchData.fromSingle(lr, prepared.llPairs, fids)
    AutoFJ.search(data, ConfigSpace.thresholds(steps), tau, gt, gtTotal)
  }
}
