package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Default blocking of §3.2, as a DataFrame pipeline.
  *
  * Records are 3-gram tokenized and tokens weighted by IDF over the
  * reference table L (the "TF-IDF weighting schema" — tokens are distinct
  * per record, so TF = 1). Candidate similarity is the summed weight of
  * common tokens, computed by an inverted-index join (explode tokens, join
  * on token, re-aggregate per pair); each right record keeps its top
  * `⌈β·√|L|⌉` left candidates.
  *
  * Input frames must have columns (id: Long, text: String).
  */
object Blocking {

  private val tokenizeUdf =
    udf((s: String) => Tokenize.ngrams(Preprocess.lower(Option(s).getOrElse("")), 3).toSeq)

  /** ⌈β·√|L|⌉ — the number of left candidates kept per record. */
  def topK(nLeft: Long, beta: Double = 1.0): Int =
    math.max(1, math.ceil(beta * math.sqrt(nLeft.toDouble)).toInt)

  /** (token, id, weight) posting lists for one table under a given IDF. */
  private def postings(df: DataFrame, idf: DataFrame): DataFrame =
    df.select(col("id"), explode(tokenizeUdf(col("text"))).as("token"))
      .join(idf, Seq("token"))

  /** IDF weights ln(|L|/df) + 1 over the reference table's tokens. */
  def idfOverLeft(left: DataFrame): DataFrame = {
    val n = left.count()
    left
      .select(col("id"), explode(tokenizeUdf(col("text"))).as("token"))
      .groupBy("token")
      .agg(countDistinct("id").as("df"))
      .select(col("token"), (log(lit(n.toDouble) / col("df")) + 1.0).as("weight"))
  }

  /** Top-k L candidates per right record: (leftId, rightId, blockSim). */
  def candidates(left: DataFrame, right: DataFrame, k: Int, idf: DataFrame): DataFrame = {
    val postL = postings(left, idf).withColumnRenamed("id", "leftId")
    val postR = postings(right, idf).withColumnRenamed("id", "rightId")
      .withColumnRenamed("weight", "rWeight")
    val sims = postL
      .join(postR, Seq("token"))
      .groupBy("leftId", "rightId")
      .agg(sum("weight").as("blockSim"))
    val w = Window.partitionBy("rightId").orderBy(desc("blockSim"), asc("leftId"))
    sims
      .withColumn("rk", row_number().over(w))
      .filter(col("rk") <= k)
      .drop("rk")
  }

  /** Candidate pairs for both the L–R join and the L–L self-join, sharing
    * one IDF computation. Self pairs exclude the identity (l, l).
    */
  def block(
      spark: SparkSession,
      left: DataFrame,
      right: DataFrame,
      beta: Double = 1.0,
  ): (DataFrame, DataFrame) = {
    val k = topK(left.count(), beta)
    val idf = idfOverLeft(left).cache()
    val lr = candidates(left, right, k, idf)
    // k+1 because the self pair (l, l) always ranks first and is dropped.
    val ll = candidates(left, left, k + 1, idf)
      .filter(col("leftId") =!= col("rightId"))
    (lr, ll)
  }
}
