package repro.core

import org.apache.spark.sql.SparkSession
import repro.blocking.ExactKnnBlocker
import repro.data.{CleanProfile, ERSynth}
import repro.embed.Vectorizer
import repro.matching.UniqueMappingClustering

/** Shared measurement harness for the effectiveness/efficiency benches.
  *
  * For one (model, dataset) it vectorizes both sources (timed), runs one
  * exact top-`kMax` NNS (timed), and derives from the single neighbour
  * list: blocking recall at every k ≤ kMax (Figures 3/4), and the
  * one-pass UMC threshold sweep (Figure 8, Table 5(b)). kMax = 64 per
  * DESIGN.md §5.
  */
object Harness {

  final case class Run(
      modelCode: String,
      dataset: String,
      vecSecs: Double,          // both sources (Table 4 transform column)
      blockSecs: Double,        // NNS at kMax
      neighbours: Array[(Long, Long, Double, Int)], // (qid, nid, dist, rank)
      gt: Set[(Long, Long)],
      side1Smaller: Boolean,
      smallSize: Long) {

    /** Candidate pairs canonicalized to (side1, side2) at a given k. */
    def candidatePairs(k: Int): Set[(Long, Long)] =
      neighbours.iterator.filter(_._4 <= k)
        .map { case (q, n, _, _) => if (side1Smaller) (q, n) else (n, q) }
        .toSet

    /** Blocking recall (pairs completeness) at k. */
    def recallAt(k: Int): Double = {
      if (gt.isEmpty) return 1.0
      gt.count(candidatePairs(k).contains).toDouble / gt.size
    }

    /** UMC sweep over the neighbour list: returns
      * (bestDelta, precision, recall, f1, umcSecs).
      */
    def umcBest(): (Double, Double, Double, Double, Double) = {
      val scored = neighbours.map { case (q, n, d, _) => (q, n, 1.0 / (1.0 + d)) }
      val t0 = System.nanoTime()
      val sweep = UniqueMappingClustering.sweep(scored, smallSize)
      val secs = (System.nanoTime() - t0) / 1e9
      val canon = sweep.map(m =>
        UniqueMappingClustering.Match(
          if (side1Smaller) m.id1 else m.id2,
          if (side1Smaller) m.id2 else m.id1, m.sim))
      val (d, p, r, f1) = UniqueMappingClustering.bestThreshold(canon, gt)
      (d, p, r, f1, secs)
    }
  }

  /** Vectorization time of both sources of `p` for `modelCode` (Table 4). */
  def vectorizationSecs(spark: SparkSession, p: CleanProfile, modelCode: String): Double = {
    val s1 = ERSynth.source(spark, p, 1).cache(); s1.count()
    val s2 = ERSynth.source(spark, p, 2).cache(); s2.count()
    Vectorizer.runtime(modelCode) // exclude init from the transform column
    val t0 = System.nanoTime()
    Vectorizer.vectorize(s1, modelCode, s"${p.name}#1").foreach(_ => ())
    Vectorizer.vectorize(s2, modelCode, s"${p.name}#2").foreach(_ => ())
    val secs = (System.nanoTime() - t0) / 1e9
    s1.unpersist(); s2.unpersist()
    secs
  }

  /** Full run for one (model, dataset). */
  def runOne(spark: SparkSession, p: CleanProfile, modelCode: String, kMax: Int = 64): Run = {
    import spark.implicits._
    val s1 = ERSynth.source(spark, p, 1).cache(); s1.count()
    val s2 = ERSynth.source(spark, p, 2).cache(); s2.count()
    Vectorizer.runtime(modelCode)

    val tv = System.nanoTime()
    val v1 = Vectorizer.vectorize(s1, modelCode, s"${p.name}#1").cache(); v1.count()
    val v2 = Vectorizer.vectorize(s2, modelCode, s"${p.name}#2").cache(); v2.count()
    val vecSecs = (System.nanoTime() - tv) / 1e9

    val side1Smaller = p.v1 <= p.v2
    val (queries, index) = if (side1Smaller) (v1, v2) else (v2, v1)
    val k = math.min(kMax, math.max(p.v1, p.v2))
    val tb = System.nanoTime()
    val nb = ExactKnnBlocker.topK(queries, index, k)
      .select("qid", "nid", "dist", "rank").as[(Long, Long, Double, Int)].collect()
    val blockSecs = (System.nanoTime() - tb) / 1e9

    val gt = ERSynth.groundTruth(spark, p).as[(Long, Long)].collect().toSet
    v1.unpersist(); v2.unpersist(); s1.unpersist(); s2.unpersist()
    Run(modelCode, p.name, vecSecs, blockSecs, nb, gt, side1Smaller, math.min(p.v1, p.v2).toLong)
  }
}
