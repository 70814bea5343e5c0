package repro.baselines

import org.apache.spark.sql.{Row, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.{Preprocess, Tokenize}
import repro.eval.Metrics.Scored

/** PPJoin [48]: set-similarity join with prefix filtering over a global
  * frequency token order plus the length filter, verified with exact
  * Jaccard — implemented as a Spark DataFrame pipeline (explode prefixes,
  * join on token, verify against broadcast token sets).
  *
  * The positional filter is an additional pruning optimization that does
  * not change results; candidates here are already bounded by blocking-
  * scale sizes, so prefix + length filtering suffices.
  */
object PPJoin {

  private def tokens(s: String): Array[String] = Tokenize.space(Preprocess.lower(s))

  def run(
      spark: SparkSession,
      left: Seq[(Long, String)],
      right: Seq[(Long, String)],
      threshold: Double = 0.3,
  ): Vector[Scored] = {
    val lToks = left.map { case (id, s) => id -> tokens(s) }.toMap
    val rToks = right.map { case (id, s) => id -> tokens(s) }.toMap

    // Global order: ascending document frequency (rare tokens first).
    val df = (lToks.values ++ rToks.values).flatten
      .groupBy(identity).map { case (t, g) => t -> g.size }
    val rank: Map[String, Int] =
      df.toVector.sortBy { case (t, c) => (c, t) }.zipWithIndex
        .map { case ((t, _), i) => t -> i }.toMap

    def prefix(toks: Array[String]): Array[String] = {
      val sorted = toks.sortBy(rank)
      val pl = math.max(1, sorted.length - math.ceil(threshold * sorted.length).toInt + 1)
      sorted.take(pl)
    }

    val schema = StructType(Seq(
      StructField("id", LongType, nullable = false),
      StructField("token", StringType, nullable = false),
      StructField("size", IntegerType, nullable = false)))

    def prefixDF(recs: Map[Long, Array[String]], idCol: String, sizeCol: String) = {
      val rows = recs.toSeq.flatMap { case (id, toks) =>
        prefix(toks).map(t => Row(id, t, toks.length))
      }
      spark.createDataFrame(spark.sparkContext.parallelize(rows, 8), schema)
        .withColumnRenamed("id", idCol).withColumnRenamed("size", sizeCol)
    }

    val lp = prefixDF(lToks, "lId", "lSize")
    val rp = prefixDF(rToks, "rId", "rSize")
    val cand = lp.join(rp, Seq("token"))
      // Length filter: t·|x| ≤ |y| ≤ |x|/t.
      .filter(col("rSize") >= ceil(col("lSize") * threshold) &&
              col("rSize") <= floor(col("lSize") / threshold))
      .select("lId", "rId").distinct()
      .collect().map(r => (r.getLong(0), r.getLong(1)))

    // Exact Jaccard verification on the driver (candidates are small).
    val verified = cand.iterator.map { case (lid, rid) =>
      val a = lToks(lid); val b = rToks(rid)
      val inter = a.intersect(b).length
      val sim = if (a.length + b.length == 0) 0.0
                else inter.toDouble / (a.length + b.length - inter)
      (CandPair(lid, rid, "", ""), sim)
    }.filter(_._2 >= threshold).toVector

    ScoredBaselines.bestPerRight(verified)
  }
}
