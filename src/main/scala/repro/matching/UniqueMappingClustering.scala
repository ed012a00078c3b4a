package repro.matching

import scala.collection.mutable

/** Unique Mapping Clustering (paper §4.3; Lacoste-Julien et al. SIGMa).
  *
  * Iterates over candidate pairs in descending similarity order, matching
  * a pair iff neither side is matched yet, until every entity of the
  * smaller collection is matched or similarities fall below the threshold
  * δ.
  *
  * Greedy-prefix property: processing order does not depend on δ, and a
  * pair accepted at similarity s is accepted for every δ ≤ s. [[sweep]]
  * exploits this to evaluate the whole δ grid from a single δ=0 run
  * (DESIGN.md §5).
  */
object UniqueMappingClustering {

  /** One accepted match with the similarity at which it was accepted. */
  final case class Match(id1: Long, id2: Long, sim: Double)

  /** Run UMC at threshold δ over (qid, nid, sim) pairs (any order).
    * `smallSize` = |smaller collection| for the early-exit condition.
    */
  def cluster(pairs: Iterable[(Long, Long, Double)], delta: Double,
              smallSize: Long = Long.MaxValue): Vector[Match] =
    run(pairs, delta, smallSize)

  /** δ=0 run returning every greedy acceptance with its similarity;
    * matches at threshold δ are exactly those with sim ≥ δ.
    */
  def sweep(pairs: Iterable[(Long, Long, Double)],
            smallSize: Long = Long.MaxValue): Vector[Match] =
    run(pairs, 0.0, smallSize)

  private def run(pairs: Iterable[(Long, Long, Double)], delta: Double,
                  smallSize: Long): Vector[Match] = {
    val sorted = pairs.toArray.sortBy(p => (-p._3, p._1, p._2))
    val m1 = mutable.HashSet.empty[Long]
    val m2 = mutable.HashSet.empty[Long]
    val out = Vector.newBuilder[Match]
    var i = 0
    var matched = 0L
    while (i < sorted.length && matched < smallSize && sorted(i)._3 >= delta) {
      val (a, b, s) = sorted(i)
      if (!m1.contains(a) && !m2.contains(b)) {
        m1 += a; m2 += b; matched += 1
        out += Match(a, b, s)
      }
      i += 1
    }
    out.result()
  }

  /** F1-optimal threshold over the paper's grid δ ∈ {0.05, …, 0.95},
    * evaluated from a δ=0 sweep. Returns (bestDelta, precision, recall, f1).
    */
  def bestThreshold(sweepMatches: Vector[Match], groundTruth: Set[(Long, Long)]): (Double, Double, Double, Double) = {
    val grid = (1 to 19).map(_ * 0.05)
    var best = (0.05, 0.0, 0.0, -1.0)
    for (d <- grid) {
      val predicted = sweepMatches.filter(_.sim >= d).map(m => (m.id1, m.id2)).toSet
      val (p, r, f1) = MatchMetrics.prf(predicted, groundTruth)
      if (f1 > best._4) best = (d, p, r, f1)
    }
    (best._1, best._2, best._3, best._4)
  }
}
