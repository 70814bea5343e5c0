package repro.core

import org.apache.spark.sql.Row
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.{Oracle, SparkSpec}

class BlockingSpec extends SparkSpec {

  private val L = Seq(
    1L -> "2008 LSU Tigers baseball team",
    2L -> "2008 LSU Tigers football team",
    3L -> "2007 Wisconsin Badgers football team",
    4L -> "Saint Mary Hospital of Salem",
  )
  private val R = Seq(
    100L -> "2008 LSU baseball team",
    101L -> "Saint Mary Hospital Salem",
  )

  private def dfL = SingleColumnPipeline.toDF(spark, L)
  private def dfR = SingleColumnPipeline.toDF(spark, R)

  test("topK is ceil(beta * sqrt(|L|))") {
    assert(Blocking.topK(100) == 10)
    assert(Blocking.topK(100, 1.5) == 15)
    assert(Blocking.topK(2) == 2)
    assert(Blocking.topK(1) == 1)
  }

  test("candidates keeps at most k lefts per right record") {
    val idf = Blocking.idfOverLeft(dfL)
    val cand = Blocking.candidates(dfL, dfR, k = 2, idf)
    val counts = cand.groupBy("rightId").count().collect().map(_.getLong(1))
    assert(counts.forall(_ <= 2))
  }

  test("the true counterpart survives blocking") {
    val (lr, _) = Blocking.block(spark, dfL, dfR)
    val pairs = lr.select("leftId", "rightId").collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(pairs.contains((1L, 100L)), "r=100 should keep l=1 as candidate")
    assert(pairs.contains((4L, 101L)), "r=101 should keep l=4 as candidate")
  }

  test("self candidates exclude the identity pair") {
    val (_, ll) = Blocking.block(spark, dfL, dfR)
    val pairs = ll.select("leftId", "rightId").collect().map(r => (r.getLong(0), r.getLong(1)))
    assert(pairs.forall { case (a, b) => a != b })
    assert(pairs.nonEmpty)
  }

  test("near-duplicate reference records block together") {
    val (_, ll) = Blocking.block(spark, dfL, dfR)
    val pairs = ll.select("leftId", "rightId").collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(pairs.contains((1L, 2L)) && pairs.contains((2L, 1L)))
  }

  test("blockSim is the IDF-weighted common-token weight (DuckDB oracle)") {
    // Reproduce the inverted-index aggregation externally and let DuckDB
    // arbitrate the join+groupBy+sum semantics.
    val idfMap = Blocking.idfOverLeft(dfL).collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    def posting(recs: Seq[(Long, String)], idCol: String) = {
      val rows = recs.flatMap { case (id, t) =>
        Tokenize.ngrams(Preprocess.lower(t), 3).flatMap(tok =>
          idfMap.get(tok).map(w => Row(id, tok, w)))
      }
      spark.createDataFrame(spark.sparkContext.parallelize(rows, 4), StructType(Seq(
        StructField(idCol, LongType), StructField("token", StringType),
        StructField("weight", DoubleType))))
    }
    val postL = posting(L, "leftId")
    val postR = posting(R, "rightId").drop("weight")
    val sparkSims = postL.join(postR, Seq("token"))
      .groupBy("leftId", "rightId")
      .agg(round(sum("weight"), 4).as("blockSim"))
      .select(col("leftId").cast("string").as("leftId"),
              col("rightId").cast("string").as("rightId"), col("blockSim"))
    Oracle.assertEquivalent(sparkSims,
      """SELECT l.leftId AS leftId, r.rightId AS rightId,
        |       ROUND(SUM(CAST(l.weight AS DOUBLE)), 4) AS blockSim
        |FROM postl l JOIN postr r ON l.token = r.token
        |GROUP BY l.leftId, r.rightId""".stripMargin,
      "postl" -> postL, "postr" -> postR)
  }

  test("top-k ranking matches a SQL window (DuckDB oracle)") {
    val idf = Blocking.idfOverLeft(dfL)
    val cand = Blocking.candidates(dfL, dfR, k = 2, idf)
      .select(col("leftId").cast("string").as("leftId"),
              col("rightId").cast("string").as("rightId"))
    val simsDf = {
      val idfMap = idf.collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
      val rows = for {
        (lid, lt) <- L
        (rid, rt) <- R
        common = Tokenize.ngrams(Preprocess.lower(lt), 3)
          .intersect(Tokenize.ngrams(Preprocess.lower(rt), 3))
        sim = common.flatMap(idfMap.get).sum if sim > 0
      } yield Row(lid, rid, sim)
      spark.createDataFrame(spark.sparkContext.parallelize(rows, 4), StructType(Seq(
        StructField("leftId", LongType), StructField("rightId", LongType),
        StructField("sim", DoubleType))))
    }
    Oracle.assertEquivalent(cand,
      """SELECT leftId, rightId FROM (
        |  SELECT leftId, rightId,
        |         ROW_NUMBER() OVER (PARTITION BY rightId
        |                            ORDER BY CAST(sim AS DOUBLE) DESC, CAST(leftId AS BIGINT) ASC) AS rk
        |  FROM sims) WHERE rk <= 2""".stripMargin,
      "sims" -> simsDf)
  }
}
