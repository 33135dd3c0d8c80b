package repro.core

import scala.collection.mutable

/** Running top-k list of lower bounds (`L_lb`, §III–IV).
  *
  * Holds the k largest current lower-bound values over all candidates.
  * `threshold` is `θ_lb` — the smallest value in a full list, 0 otherwise
  * (Lemma 4 guarantees `θ_lb ≤ θ_k ≤ θ_k*`). Values only increase over a
  * query's lifetime, so evict-smallest maintenance is exact.
  */
final class TopKList(k: Int) {
  require(k >= 1)

  // Ordered (value, id); the Map gives the current value per tracked id.
  private val tree = mutable.TreeSet.empty[(Double, Long)]
  private val values = mutable.HashMap.empty[Long, Double]

  /** Current θ_lb. */
  def threshold: Double = if (tree.size < k) 0.0 else tree.head._1

  def size: Int = tree.size

  /** Raises (or inserts) `id`'s lower bound. Returns true iff θ_lb changed. */
  def update(id: Long, lb: Double): Boolean = {
    val before = threshold
    values.get(id) match {
      case Some(old) =>
        if (lb > old) { tree.remove((old, id)); tree.add((lb, id)); values(id) = lb }
      case None =>
        if (tree.size < k) { tree.add((lb, id)); values(id) = lb }
        else if (lb > tree.head._1) {
          val (ev, evId) = tree.head
          tree.remove((ev, evId)); values.remove(evId)
          tree.add((lb, id)); values(id) = lb
        }
    }
    threshold != before
  }

  /** Ids currently in the list, descending by lower bound. */
  def entries: Seq[(Long, Double)] = tree.toSeq.reverse.map { case (v, id) => (id, v) }
}
