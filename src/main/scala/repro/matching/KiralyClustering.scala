package repro.matching

import scala.collection.mutable

/** Kiraly Clustering (paper §4.3): a linear-time approximation of maximum
  * stable marriage. Implemented as deferred acceptance (Gale–Shapley) over
  * the candidate lists: left entities propose in descending similarity;
  * a right entity holds its best proposal so far and trades up, subject to
  * the threshold δ.
  */
object KiralyClustering {

  def cluster(pairs: Iterable[(Long, Long, Double)], delta: Double): Vector[(Long, Long)] = {
    // preference lists per left entity, descending
    val prefs = mutable.HashMap.empty[Long, mutable.ArrayBuffer[(Long, Double)]]
    for ((a, b, s) <- pairs if s >= delta)
      prefs.getOrElseUpdate(a, mutable.ArrayBuffer.empty) += ((b, s))
    prefs.values.foreach(buf => {
      val sorted = buf.sortBy(p => (-p._2, p._1)); buf.clear(); buf ++= sorted
    })

    val next    = mutable.HashMap.empty[Long, Int] // next proposal index per left
    val held    = mutable.HashMap.empty[Long, (Long, Double)] // right -> (left, sim)
    val free    = mutable.Queue.empty[Long]
    prefs.keys.foreach(free.enqueue(_))

    while (free.nonEmpty) {
      val a  = free.dequeue()
      val ps = prefs(a)
      val i  = next.getOrElse(a, 0)
      if (i < ps.length) {
        next(a) = i + 1
        val (b, s) = ps(i)
        held.get(b) match {
          case None => held(b) = (a, s)
          case Some((a0, s0)) =>
            if (s > s0 || (s == s0 && a < a0)) { held(b) = (a, s); free.enqueue(a0) }
            else free.enqueue(a)
        }
      }
    }
    held.iterator.map { case (b, (a, _)) => (a, b) }.toVector.sorted
  }
}
