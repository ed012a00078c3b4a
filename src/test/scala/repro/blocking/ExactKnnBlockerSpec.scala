package repro.blocking

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.util.Det

class ExactKnnBlockerSpec extends SparkSpec {

  private def vecDf(vs: Seq[(Long, Array[Float])]) = {
    import spark.implicits._
    vs.toDF("id", "vec")
  }

  private val queries = Seq(
    0L -> Array(0f, 0f), 1L -> Array(10f, 10f))
  private val index = Seq(
    100L -> Array(0f, 1f), 101L -> Array(0f, 2f), 102L -> Array(0f, 3f),
    103L -> Array(10f, 9f), 104L -> Array(5f, 5f))

  test("topK returns the k nearest per query in rank order") {
    import spark.implicits._
    val top = ExactKnnBlocker.topK(vecDf(queries), vecDf(index), 2)
      .select("qid", "nid", "rank").as[(Long, Long, Int)].collect().toSet
    assert(top == Set((0L, 100L, 1), (0L, 101L, 2), (1L, 103L, 1), (1L, 104L, 2)))
  }

  test("distances are exact euclidean") {
    import spark.implicits._
    val top = ExactKnnBlocker.topK(vecDf(queries), vecDf(index), 1)
      .select("qid", "dist").as[(Long, Double)].collect().toMap
    assert(math.abs(top(0L) - 1.0) < 1e-6)
    assert(math.abs(top(1L) - 1.0) < 1e-6)
  }

  test("k larger than index returns all index rows") {
    val top = ExactKnnBlocker.topK(vecDf(queries), vecDf(index), 100)
    assert(top.count() == queries.size * index.size)
  }

  test("k must be positive") {
    intercept[IllegalArgumentException](ExactKnnBlocker.topK(vecDf(queries), vecDf(index), 0))
  }

  test("agrees with brute force on random vectors") {
    val rq = (0L until 15L).map(i => i -> Det.uniformVec(Det.seed(1L, i), 24))
    val ri = (0L until 40L).map(i => (100L + i) -> Det.uniformVec(Det.seed(2L, i), 24))
    val k = 5
    import spark.implicits._
    val got = ExactKnnBlocker.topK(vecDf(rq), vecDf(ri), k)
      .select("qid", "nid", "rank").as[(Long, Long, Int)].collect()
      .groupBy(_._1).map { case (q, rs) => q -> rs.sortBy(_._3).map(_._2).toSeq }
    val want = rq.map { case (q, qv) =>
      q -> ri.map { case (n, nv) => (Det.l2(qv, nv), n) }.sortBy(identity).take(k).map(_._2)
    }.toMap
    assert(got == want)
  }

  test("ties broken by ascending nid") {
    import spark.implicits._
    val q = Seq(0L -> Array(0f))
    val i = Seq(5L -> Array(1f), 3L -> Array(1f), 9L -> Array(1f))
    val top = ExactKnnBlocker.topK(vecDf(q), vecDf(i), 2)
      .orderBy("rank").select("nid").as[Long].collect().toSeq
    assert(top == Seq(3L, 5L))
  }

  test("candidates derives smaller k from a larger topK") {
    val top10 = ExactKnnBlocker.topK(vecDf(queries), vecDf(index), 4)
    val c1 = ExactKnnBlocker.candidates(top10, 1)
    assert(c1.count() == queries.size)
    val c3 = ExactKnnBlocker.candidates(top10, 3)
    assert(c3.count() == queries.size * 3)
  }

  test("oracle: grouped-min (the top-1-per-group pattern) agrees with DuckDB") {
    import spark.implicits._
    val pts = (0 until 60).map(i =>
      (i.toLong, (Det.uniform(Det.seed(3L, i)) * 4).toInt, (Det.uniform(Det.seed(4L, i)) * 100).toInt))
      .toDF("id", "g", "y")
    val got = pts.groupBy("g").agg(min(col("y")).as("best"))
      .select(col("g").cast("int").as("g"), col("best").cast("int").as("best"))
    Oracle.assertEquivalent(got,
      "SELECT CAST(g AS INT) AS g, CAST(min(CAST(y AS INT)) AS INT) AS best FROM pts GROUP BY g",
      "pts" -> pts)
  }

  test("BlockingMetrics.recall on exact candidates") {
    import spark.implicits._
    val cands = Seq((0L, 100L), (1L, 103L)).toDF("id1", "id2")
    val gt = Seq((0L, 100L), (1L, 104L)).toDF("id1", "id2")
    assert(BlockingMetrics.recall(cands, gt) == 0.5)
  }

  test("BlockingMetrics.precision counts distinct candidates") {
    import spark.implicits._
    val cands = Seq((0L, 100L), (0L, 100L), (1L, 103L)).toDF("id1", "id2")
    val gt = Seq((0L, 100L)).toDF("id1", "id2")
    assert(BlockingMetrics.precision(cands, gt) == 0.5)
  }

  test("BlockingMetrics.recall of empty ground truth is 1") {
    import spark.implicits._
    val cands = Seq((0L, 100L)).toDF("id1", "id2")
    val gt = Seq.empty[(Long, Long)].toDF("id1", "id2")
    assert(BlockingMetrics.recall(cands, gt) == 1.0)
  }

  test("BlockingMetrics.precision of empty candidates is 0") {
    import spark.implicits._
    val cands = Seq.empty[(Long, Long)].toDF("id1", "id2")
    val gt = Seq((0L, 100L)).toDF("id1", "id2")
    assert(BlockingMetrics.precision(cands, gt) == 0.0)
  }
}
