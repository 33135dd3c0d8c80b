package repro.core

import scala.collection.mutable

/** Outcome of the post-processing phase for one query. */
final case class PostProcessingOutput(
    results: Seq[ScoredSet],
    noEm: Int,
    emEarlyTerminated: Int,
    emComputed: Int,
    finalizeEms: Int,
    timedOut: Boolean)

/** Algorithm 2 — verification of refinement survivors.
  *
  * Maintains the three structures of §VI: the running top-k lower-bound list
  * `L_lb` (carried over from refinement, giving θ_lb), the top-k upper-bound
  * list `L_ub` (giving θ_ub = its minimum UB when full), and a priority queue
  * `Q_ub` of the remaining survivors ordered by UB.
  *
  * Filters:
  *  - **No-EM** (Lemma 7): a set with `LB(C) ≥ θ_ub` is guaranteed to belong
  *    to a top-k result and is accepted without any matching computation.
  *    Our `noEm` counter also includes survivors *discarded* without a
  *    matching because a grown θ_lb exceeded their UB — both cases resolve a
  *    survivor with zero matching work, which is what Tables II/IV/V tally.
  *  - **EM-Early-Terminated** (Lemma 8): the Hungarian label-sum bound aborts
  *    a matching as soon as it proves `SO(C) < θ_lb`.
  */
object PostProcessing {

  def run(records: IndexedSeq[SetRecord],
          refinement: RefinementOutput,
          query: Array[String],
          params: KoiosParams,
          deadlineNanos: Long): PostProcessingOutput = {

    val topkLb = refinement.topkLb
    val edgesOf: String => Array[(Int, Double)] =
      t => refinement.edgeCache.getOrElse(t, PostProcessing.NoEdges)
    // The paper's kernel builds the full |Q|×|C| similarity matrix from the
    // refinement-phase cache; reducedGraphs switches to the edge-reduced one.
    def graphOf(idx: Int): Matching.Graph =
      if (params.reducedGraphs) Matching.buildGraph(records(idx).tokens, edgesOf)
      else Matching.buildFullGraph(query.length, records(idx).tokens, edgesOf)

    final class PostSet(val idx: Int, var lb: Double, var ub: Double) {
      var checked = false
      var exact = false
    }

    var noEm = 0
    var emEarly = 0
    var emDone = 0
    var finalized = 0
    var timedOut = false

    // Survivors arrive pre-sorted descending by UB.
    val all = refinement.survivors.map(sv => new PostSet(sv.idx, sv.lb, sv.ub))
    val lub = mutable.ArrayBuffer.empty[PostSet] // ≤ k entries, the top UBs
    val qub = mutable.PriorityQueue.empty[PostSet](Ordering.by(p => (p.ub, -p.idx)))
    all.take(params.k).foreach(lub += _)
    all.drop(params.k).foreach(qub.enqueue(_))

    /** Drop L_ub entries beaten by θ_lb; unchecked drops are No-EM prunes.
      * [[Matching.PruneEps]] slack guards fp-tied scores.
      */
    def sweep(): Unit = {
      val theta = topkLb.threshold - Matching.PruneEps
      var i = lub.length - 1
      while (i >= 0) {
        if (lub(i).ub < theta) {
          if (!lub(i).checked) noEm += 1
          lub.remove(i)
        }
        i -= 1
      }
    }

    /** Refill L_ub from Q_ub up to k entries, discarding UB-beaten sets. */
    def refill(): Unit = {
      val theta = topkLb.threshold - Matching.PruneEps
      while (lub.length < params.k && qub.nonEmpty) {
        val c = qub.dequeue()
        if (c.ub < theta) { if (!c.checked) noEm += 1 }
        else lub += c
      }
    }

    def thetaUb: Double =
      if (lub.length < params.k && qub.isEmpty) 0.0
      else if (lub.isEmpty) 0.0
      else lub.iterator.map(_.ub).min

    var continue = true
    while (continue && !timedOut) {
      sweep(); refill()
      // Select the unchecked set with the highest UB.
      var best: PostSet = null
      lub.foreach { c => if (!c.checked && (best == null || c.ub > best.ub)) best = c }
      if (best == null) continue = false
      else {
        if (best.lb >= thetaUb) {
          // No-EM (Lemma 7): guaranteed to be in a top-k result.
          best.checked = true
          noEm += 1
        } else {
          Matching.semanticOverlap(graphOf(best.idx), topkLb.threshold) match {
            case EarlyTerminated =>
              emEarly += 1
              lub -= best // SO < θ_lb ≤ θ_k*: out of every top-k result.
            case Completed(so) =>
              emDone += 1
              best.lb = so; best.ub = so
              best.checked = true; best.exact = true
              topkLb.update(best.idx.toLong, so)
              // SO may no longer be a top-k UB: demote and let refill decide.
              lub -= best
              qub.enqueue(best)
          }
        }
        if (deadlineNanos > 0 && System.nanoTime() > deadlineNanos) timedOut = true
      }
    }

    // Drain: survivors still queued when L_ub is complete are resolved
    // without any matching work (their UB is at most the k-th largest) —
    // tally them under No-EM so filter counts partition the survivors.
    while (qub.nonEmpty) { if (!qub.dequeue().checked) noEm += 1 }

    // Finalize: attach exact scores to No-EM-accepted results so every
    // returned score is exact (needed by the distributed top-k merge).
    val results = lub.map { c =>
      if (c.exact) ScoredSet(records(c.idx).id, c.ub, exact = true)
      else if (params.finalizeScores) {
        val so = Matching.semanticOverlap(graphOf(c.idx)) match {
          case Completed(s)    => s
          case EarlyTerminated => throw new IllegalStateException("unreachable")
        }
        finalized += 1
        ScoredSet(records(c.idx).id, so, exact = true)
      } else ScoredSet(records(c.idx).id, c.ub, exact = false)
    }.sortBy(r => (-r.score, r.id)).toSeq

    PostProcessingOutput(results, noEm, emEarly, emDone, finalized, timedOut)
  }

  private val NoEdges = Array.empty[(Int, Double)]
}
