package repro.matching

import scala.collection.mutable

/** Exact Clustering (paper §4.3): match two entities iff each is the
  * other's best candidate and the similarity exceeds δ.
  */
object ExactClustering {

  def cluster(pairs: Iterable[(Long, Long, Double)], delta: Double): Vector[(Long, Long)] = {
    val best1 = mutable.HashMap.empty[Long, (Long, Double)]
    val best2 = mutable.HashMap.empty[Long, (Long, Double)]
    for ((a, b, s) <- pairs if s >= delta) {
      if (!best1.get(a).exists(x => x._2 > s || (x._2 == s && x._1 < b))) best1(a) = (b, s)
      if (!best2.get(b).exists(x => x._2 > s || (x._2 == s && x._1 < a))) best2(b) = (a, s)
    }
    best1.iterator.collect {
      case (a, (b, _)) if best2.get(b).exists(_._1 == a) => (a, b)
    }.toVector.sorted
  }
}
