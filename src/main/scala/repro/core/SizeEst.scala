package repro.core

/** Rough JVM-heap size estimates for the search data structures, mirroring
  * the paper's memory-footprint accounting (§VIII-D): the reported number is
  * the sum of the refinement-phase structures (token stream buffers, edge
  * cache, candidate states, buckets) and the post-processing structures
  * (top-k lists, UB priority queue), *excluding* the repository itself and
  * the shared indexes, which are query-independent.
  *
  * Constants approximate a 64-bit JVM with compressed oops: strings cost
  * ~(40 + 2·len) bytes, boxed tuple entries in collections ~48 bytes, map
  * entries ~40 bytes of overhead.
  */
object SizeEst {

  def ofString(s: String): Long = 40L + 2L * s.length

  /** Token stream: per query token a buffered (token, sim) list. */
  def ofTokenStream(bufferedPairs: Long): Long = bufferedPairs * 56L

  /** Edge cache: token → array of (qIdx, sim). */
  def ofEdgeCache(cache: collection.Map[String, Array[(Int, Double)]]): Long =
    cache.iterator.map { case (t, es) => ofString(t) + 40L + es.length.toLong * 24L }.sum

  /** Candidate bound states: matched-bit set + matched-token set + counters. */
  def ofCandidates(nCandidates: Int, queryLen: Int, avgMatched: Double): Long =
    nCandidates.toLong * (64L + queryLen / 8L + (avgMatched * 48L).toLong)

  /** Bucket trees: one boxed (Double, Int) node per live candidate. */
  def ofBuckets(nLive: Int): Long = nLive.toLong * 56L

  /** Post-processing lists: L_lb, L_ub (k entries) and Q_ub (survivors). */
  def ofPostProcessing(k: Int, survivors: Int): Long =
    2L * k * 48L + survivors.toLong * 48L
}
