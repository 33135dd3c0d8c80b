package repro.core

import scala.collection.mutable

/** Outcome of an exact matching computation. */
sealed trait HungarianOutcome
/** The matching ran to completion; `score` is the exact semantic overlap. */
final case class Completed(score: Double) extends HungarianOutcome
/** The label-sum upper bound fell below the pruning threshold (Lemma 8);
  * the true score is strictly below the threshold supplied by the caller.
  */
case object EarlyTerminated extends HungarianOutcome

/** Bipartite-matching kernel used by all engines.
  *
  * The semantic overlap `SO(Q, C)` (Def. 1) is the score of a maximum-weight
  * optional one-to-one matching in the bipartite graph whose edges are
  * `sim_α(q, c) > 0`. With non-negative weights, the optional matching equals
  * the maximum-weight perfect matching on the zero-padded square matrix, so
  * the classic Kuhn–Munkres algorithm applies.
  */
object Matching {

  private val Eps = 1e-12

  /** Slack applied to every pruning comparison: a candidate is pruned only if
    * it is below the threshold by more than this. Floating-point sums (label
    * sums, greedy scores, bucket sums) drift by ~1e-13 per op; without slack
    * a set whose SO exactly equals θ_lb (e.g. the k-th set itself, whose
    * greedy LB is often tight) can be pruned spuriously.
    */
  val PruneEps = 1e-9

  /** Reduced bipartite graph of one (query, candidate) pair: only nodes with
    * at least one α-edge are materialized, which keeps the O(n³) matching on
    * the *effective* graph size rather than the raw cardinalities.
    *
    * @param qRows distinct query-token positions with ≥1 edge (row order)
    * @param w     dense weight matrix, rows = qRows, cols = candidate tokens
    *              with ≥1 edge
    */
  final case class Graph(qRows: Array[Int], w: Array[Array[Double]]) {
    def isEmpty: Boolean = qRows.isEmpty
  }

  /** Builds the reduced graph from per-candidate-token edge lists.
    *
    * @param cTokens candidate tokens
    * @param edgesOf token → (qIdx, sim) pairs with sim ≥ α (e.g. the stream's
    *                similarity cache); tokens without entry have no edges
    */
  def buildGraph(cTokens: Array[String], edgesOf: String => Array[(Int, Double)]): Graph = {
    val perCol = new mutable.ArrayBuffer[Array[(Int, Double)]]()
    val qSet = new mutable.TreeSet[Int]()
    var i = 0
    while (i < cTokens.length) {
      val es = edgesOf(cTokens(i))
      if (es.nonEmpty) { perCol += es; es.foreach(e => qSet += e._1) }
      i += 1
    }
    if (perCol.isEmpty) return Graph(Array.empty, Array.empty)
    val qRows = qSet.toArray
    val rowOf = qRows.zipWithIndex.toMap
    val w = Array.fill(qRows.length, perCol.length)(0.0)
    var c = 0
    while (c < perCol.length) {
      perCol(c).foreach { case (qi, s) => w(rowOf(qi))(c) = math.max(w(rowOf(qi))(c), s) }
      c += 1
    }
    Graph(qRows, w)
  }

  /** The paper's matrix construction (§VIII-A3): the similarity matrix spans
    * ALL query tokens × ALL candidate tokens (zero where no α-edge), exactly
    * like the hungarian-algorithm-cpp implementation the paper uses — so one
    * verification costs O(max(|Q|,|C|)³) regardless of how sparse the graph
    * is. This cost model is what makes the unfiltered baseline explode and
    * the filter stack pay off; [[buildGraph]] (edge-reduced) is kept as an
    * optimization toggle (`KoiosParams.reducedGraphs`) and yields identical
    * scores.
    */
  def buildFullGraph(qCount: Int, cTokens: Array[String],
                     edgesOf: String => Array[(Int, Double)]): Graph = {
    val w = Array.fill(qCount, cTokens.length)(0.0)
    var c = 0
    var any = false
    while (c < cTokens.length) {
      val es = edgesOf(cTokens(c))
      var e = 0
      while (e < es.length) {
        w(es(e)._1)(c) = math.max(w(es(e)._1)(c), es(e)._2)
        any = true
        e += 1
      }
      c += 1
    }
    if (!any) Graph(Array.empty, Array.empty)
    else Graph(Array.range(0, qCount), w)
  }

  /** Direct edge lists between explicit token arrays (reference path for
    * tests, oracles and the Spark verification UDF).
    */
  def directEdges(qTokens: Array[String], simFn: TokenSimilarity, alpha: Double)
      : String => Array[(Int, Double)] = { (c: String) =>
    val buf = new mutable.ArrayBuffer[(Int, Double)]()
    var qi = 0
    while (qi < qTokens.length) {
      val s = simFn.simAlpha(qTokens(qi), c, alpha)
      if (s > 0.0) buf += ((qi, s))
      qi += 1
    }
    buf.toArray
  }

  /** Greedy matching score (Lemma 3 lower bound): repeatedly take the
    * heaviest edge between unmatched nodes. Deterministic tie-breaking.
    * At least half the optimal score [Vazirani 2001].
    */
  def greedyScore(g: Graph): Double = {
    if (g.isEmpty) return 0.0
    val edges = new mutable.ArrayBuffer[(Double, Int, Int)]()
    var i = 0
    while (i < g.w.length) {
      var j = 0
      while (j < g.w(i).length) {
        if (g.w(i)(j) > 0.0) edges += ((g.w(i)(j), i, j))
        j += 1
      }
      i += 1
    }
    val sorted = edges.sortBy { case (s, i, j) => (-s, i, j) }
    val mr = new Array[Boolean](g.w.length)
    val mc = new Array[Boolean](if (g.w.isEmpty) 0 else g.w(0).length)
    var score = 0.0
    sorted.foreach { case (s, i, j) =>
      if (!mr(i) && !mc(j)) { mr(i) = true; mc(j) = true; score += s }
    }
    score
  }

  /** Maximum-weight bipartite matching via Kuhn–Munkres with node labels and
    * slack arrays, O(n³). The running node-label sum `Σ lx + Σ ly` is an
    * anytime upper bound on the optimal matching score (Kuhn–Munkres
    * theorem); when it drops below `theta` the computation aborts with
    * [[EarlyTerminated]] — the EM-Early-Terminated filter of Lemma 8.
    *
    * @param w     rows × cols non-negative weights (rectangular allowed)
    * @param theta early-termination threshold; `Double.NegativeInfinity`
    *              disables the filter
    */
  def hungarianMax(w: Array[Array[Double]], theta: Double = Double.NegativeInfinity)
      : HungarianOutcome = {
    val rows = w.length
    val cols = if (rows == 0) 0 else w(0).length
    if (rows == 0 || cols == 0) {
      return if (0.0 < theta - PruneEps) EarlyTerminated else Completed(0.0)
    }
    val n = math.max(rows, cols)
    @inline def weight(i: Int, j: Int): Double = if (i < rows && j < cols) w(i)(j) else 0.0

    val lx = Array.tabulate(n) { i =>
      var m = 0.0; var j = 0
      while (j < cols) { if (weight(i, j) > m) m = weight(i, j); j += 1 }
      m
    }
    val ly = new Array[Double](n)
    var labelSum = { var s = 0.0; var i = 0; while (i < n) { s += lx(i); i += 1 }; s }
    if (labelSum < theta - PruneEps) return EarlyTerminated

    val matchL = Array.fill(n)(-1)
    val matchR = Array.fill(n)(-1)
    val slack = new Array[Double](n)
    val way = new Array[Int](n)
    val inS = new Array[Boolean](n)
    val inT = new Array[Boolean](n)

    var root = 0
    while (root < n) {
      java.util.Arrays.fill(inS, false)
      java.util.Arrays.fill(inT, false)
      var j = 0
      while (j < n) { slack(j) = lx(root) + ly(j) - weight(root, j); way(j) = root; j += 1 }
      inS(root) = true
      var endCol = -1
      while (endCol == -1) {
        var delta = Double.MaxValue; var jmin = -1
        j = 0
        while (j < n) { if (!inT(j) && slack(j) < delta) { delta = slack(j); jmin = j }; j += 1 }
        if (delta > Eps) {
          var i = 0
          while (i < n) { if (inS(i)) lx(i) -= delta; i += 1 }
          j = 0
          while (j < n) { if (inT(j)) ly(j) += delta else slack(j) -= delta; j += 1 }
          // |S| = |T| + 1 in the alternating tree, so the sum shrinks by delta.
          labelSum -= delta
          if (labelSum < theta - PruneEps) return EarlyTerminated
        }
        inT(jmin) = true
        if (matchR(jmin) == -1) endCol = jmin
        else {
          val r = matchR(jmin)
          inS(r) = true
          j = 0
          while (j < n) {
            if (!inT(j)) {
              val s = lx(r) + ly(j) - weight(r, j)
              if (s < slack(j)) { slack(j) = s; way(j) = r }
            }
            j += 1
          }
        }
      }
      var jj = endCol
      while (jj != -1) {
        val r = way(jj)
        val jNext = matchL(r)
        matchL(r) = jj; matchR(jj) = r
        jj = jNext
      }
      root += 1
    }
    var score = 0.0
    var i = 0
    while (i < rows) {
      val j = matchL(i)
      if (j >= 0 && j < cols) score += w(i)(j)
      i += 1
    }
    Completed(score)
  }

  /** Exact semantic overlap via the reduced graph and the Hungarian kernel. */
  def semanticOverlap(g: Graph, theta: Double = Double.NegativeInfinity): HungarianOutcome =
    if (g.isEmpty) { if (0.0 < theta - PruneEps) EarlyTerminated else Completed(0.0) }
    else hungarianMax(g.w, theta)

  /** Reference SO(Q, C) computed directly from the similarity function —
    * used by tests, the baseline, and the Spark verification UDF.
    */
  def semanticOverlapDirect(qTokens: Array[String], cTokens: Array[String],
                            simFn: TokenSimilarity, alpha: Double): Double = {
    val g = buildGraph(cTokens, directEdges(qTokens, simFn, alpha))
    semanticOverlap(g) match {
      case Completed(s)    => s
      case EarlyTerminated => throw new IllegalStateException("unreachable: no threshold")
    }
  }

  /** Greedy lower bound computed directly (used to seed θ in the Spark
    * DataFrame pipeline).
    */
  def greedyDirect(qTokens: Array[String], cTokens: Array[String],
                   simFn: TokenSimilarity, alpha: Double): Double =
    greedyScore(buildGraph(cTokens, directEdges(qTokens, simFn, alpha)))
}
