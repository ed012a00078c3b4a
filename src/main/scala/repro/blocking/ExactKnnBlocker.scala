package repro.blocking

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.util.Det

/** Exact nearest-neighbour blocking for Clean-Clean ER (paper §4.3):
  * every entity of the *smaller* collection queries the other collection
  * and keeps its k nearest vectors by Euclidean distance.
  *
  * Distributed brute force: the (bounded) query side is broadcast, each
  * index partition scans its rows keeping a per-query bounded worst-first
  * heap, and a window over the unioned partials yields the global top-k —
  * the Spark equivalent of the paper's exact GPU scan.
  */
object ExactKnnBlocker extends Serializable {

  /** (qid, nid, dist) of the k nearest index rows per query row. */
  def topK(queries: DataFrame, index: DataFrame, k: Int): DataFrame = {
    val spark = queries.sparkSession
    import spark.implicits._
    require(k > 0, s"k must be positive, got $k")

    val q = queries.select("id", "vec").as[(Long, Array[Float])].collect()
    val qIds  = q.map(_._1)
    val qVecs = q.map(_._2)
    val bq = spark.sparkContext.broadcast((qIds, qVecs))

    val partials = index.select("id", "vec").as[(Long, Array[Float])]
      .mapPartitions { it =>
        val (ids, vecs) = bq.value
        val nq = ids.length
        // per-query bounded max-heaps (worst candidate on top)
        val heaps = Array.fill(nq)(
          new scala.collection.mutable.PriorityQueue[(Double, Long)]()(Ordering.by(_._1)))
        it.foreach { case (nid, nvec) =>
          var qi = 0
          while (qi < nq) {
            val d = Det.l2(vecs(qi), nvec)
            val h = heaps(qi)
            if (h.size < k) h.enqueue((d, nid))
            else if (d < h.head._1) { h.dequeue(); h.enqueue((d, nid)) }
            qi += 1
          }
        }
        heaps.iterator.zipWithIndex.flatMap { case (h, qi) =>
          h.iterator.map { case (d, nid) => (ids(qi), nid, d) }
        }
      }
      .toDF("qid", "nid", "dist")

    val w = Window.partitionBy("qid").orderBy(col("dist").asc, col("nid").asc)
    partials
      .withColumn("rank", row_number().over(w))
      .filter(col("rank") <= k)
  }

  /** Candidate pairs at a given k, as an (id1, id2) DataFrame where id1 is
    * the query (smaller) side. Derives smaller-k results from a larger
    * precomputed topK via the rank column.
    */
  def candidates(topKDf: DataFrame, k: Int): DataFrame =
    topKDf.filter(col("rank") <= k).select(col("qid").as("id1"), col("nid").as("id2"))
}
