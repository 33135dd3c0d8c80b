package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Exhaustive-reference tests for the Hungarian kernel, the greedy matching,
  * and the label-sum early-termination filter (Lemma 8).
  */
class MatchingSpec extends AnyFunSuite {

  /** Brute-force maximum-weight optional matching (rows pick distinct cols). */
  private def bruteMax(w: Array[Array[Double]]): Double = {
    val cols = if (w.isEmpty) 0 else w(0).length
    def rec(i: Int, used: Long): Double =
      if (i == w.length) 0.0
      else {
        var best = rec(i + 1, used)
        var j = 0
        while (j < cols) {
          if ((used & (1L << j)) == 0)
            best = math.max(best, w(i)(j) + rec(i + 1, used | (1L << j)))
          j += 1
        }
        best
      }
    rec(0, 0L)
  }

  private def randomMatrix(rng: Random, rows: Int, cols: Int, sparsity: Double = 0.0)
      : Array[Array[Double]] =
    Array.fill(rows, cols) {
      if (rng.nextDouble() < sparsity) 0.0
      else math.round(rng.nextDouble() * 1000) / 1000.0
    }

  private def score(o: HungarianOutcome): Double = o match {
    case Completed(s)    => s
    case EarlyTerminated => fail("unexpected early termination")
  }

  test("empty matrix has score 0") {
    assert(score(Matching.hungarianMax(Array.empty)) == 0.0)
  }

  test("1x1 matrix") {
    assert(score(Matching.hungarianMax(Array(Array(0.7)))) == 0.7)
  }

  test("identity-best square matrix") {
    val w = Array(
      Array(1.0, 0.2, 0.1),
      Array(0.1, 1.0, 0.3),
      Array(0.0, 0.2, 1.0))
    assert(math.abs(score(Matching.hungarianMax(w)) - 3.0) < 1e-9)
  }

  test("greedy is suboptimal where Hungarian is not (paper Ex. 2 shape)") {
    // Greedy takes (q1,c1)=0.97, blocking both 0.96 and 0.95; optimal crosses.
    val w = Array(
      Array(0.97, 0.95), // q1: c1, c2
      Array(0.96, 0.0)) // q2: c1
    val g = Matching.Graph(Array(0, 1), w)
    val greedy = Matching.greedyScore(g)
    val opt = score(Matching.hungarianMax(w))
    assert(math.abs(greedy - 0.97) < 1e-9)
    assert(math.abs(opt - 1.91) < 1e-9) // 0.95 + 0.96
    assert(math.abs(opt - bruteMax(w)) < 1e-9)
  }

  test("hungarian equals brute force on 300 random square matrices") {
    val rng = new Random(1)
    for (_ <- 1 to 300) {
      val n = 1 + rng.nextInt(6)
      val w = randomMatrix(rng, n, n)
      assert(math.abs(score(Matching.hungarianMax(w)) - bruteMax(w)) < 1e-9)
    }
  }

  test("hungarian equals brute force on 300 random rectangular matrices") {
    val rng = new Random(2)
    for (_ <- 1 to 300) {
      val rows = 1 + rng.nextInt(6)
      val cols = 1 + rng.nextInt(7)
      val w = randomMatrix(rng, rows, cols)
      assert(math.abs(score(Matching.hungarianMax(w)) - bruteMax(w)) < 1e-9)
    }
  }

  test("hungarian equals brute force on sparse matrices") {
    val rng = new Random(3)
    for (_ <- 1 to 200) {
      val rows = 1 + rng.nextInt(6)
      val cols = 1 + rng.nextInt(6)
      val w = randomMatrix(rng, rows, cols, sparsity = 0.7)
      assert(math.abs(score(Matching.hungarianMax(w)) - bruteMax(w)) < 1e-9)
    }
  }

  test("greedy matching is between half-optimal and optimal (Lemma 3)") {
    val rng = new Random(4)
    for (_ <- 1 to 200) {
      val rows = 1 + rng.nextInt(6)
      val cols = 1 + rng.nextInt(6)
      val w = randomMatrix(rng, rows, cols, sparsity = 0.4)
      val g = Matching.Graph(Array.range(0, rows), w)
      val greedy = Matching.greedyScore(g)
      val opt = bruteMax(w)
      assert(greedy <= opt + 1e-9)
      assert(greedy >= opt / 2.0 - 1e-9)
    }
  }

  test("early termination fires exactly when the optimum is below θ (Lemma 8)") {
    val rng = new Random(5)
    var fired = 0
    var completed = 0
    for (_ <- 1 to 400) {
      val n = 1 + rng.nextInt(6)
      val w = randomMatrix(rng, n, n, sparsity = 0.3)
      val opt = bruteMax(w)
      val theta = rng.nextDouble() * (n + 0.5)
      if (math.abs(opt - theta) > 1e-6) { // avoid float-boundary flakiness
        Matching.hungarianMax(w, theta) match {
          case EarlyTerminated =>
            fired += 1
            assert(opt < theta, s"terminated although opt=$opt >= theta=$theta")
          case Completed(s) =>
            completed += 1
            assert(math.abs(s - opt) < 1e-9)
            assert(opt >= theta, s"completed although opt=$opt < theta=$theta")
        }
      }
    }
    assert(fired > 20, s"early termination never exercised ($fired)")
    assert(completed > 20)
  }

  test("early termination with -inf threshold never fires") {
    val rng = new Random(6)
    for (_ <- 1 to 50) {
      val w = randomMatrix(rng, 4, 4)
      assert(Matching.hungarianMax(w, Double.NegativeInfinity).isInstanceOf[Completed])
    }
  }

  test("buildGraph keeps only nodes with at least one edge") {
    val edges = Map(
      "a" -> Array((0, 0.9)),
      "b" -> Array((2, 0.8), (0, 0.85)))
    val g = Matching.buildGraph(Array("a", "b", "zzz"),
      t => edges.getOrElse(t, Array.empty[(Int, Double)]))
    assert(g.qRows.toSeq == Seq(0, 2))
    assert(g.w.length == 2) // rows: q0, q2
    assert(g.w(0).length == 2) // cols: a, b  (zzz dropped)
    assert(g.w(0)(0) == 0.9 && g.w(0)(1) == 0.85 && g.w(1)(1) == 0.8)
  }

  test("buildGraph of edgeless candidate is empty; SO is 0") {
    val g = Matching.buildGraph(Array("x", "y"), _ => Array.empty[(Int, Double)])
    assert(g.isEmpty)
    assert(Matching.semanticOverlap(g) == Completed(0.0))
    assert(Matching.semanticOverlap(g, 0.5) == EarlyTerminated)
  }

  test("semanticOverlapDirect reproduces the paper's Fig. 1 semantic ranking") {
    // Hand-built similarity emulating Fig. 1: C2 must beat C1 under semantic
    // overlap although both share the exact matches LA/Blain(e).
    val sims: Map[(String, String), Double] = Map(
      ("LA", "LA") -> 1.0,
      ("Blaine", "Blain") -> 0.9,
      ("BigApple", "NewYorkCity") -> 0.9,
      ("BigApple", "Appleton") -> 0.1, // character-level lookalike, semantically unrelated
      ("Charleston", "SC") -> 0.8,
      ("Columbia", "SC") -> 0.75)
    val simFn = new TokenSimilarity {
      def sim(a: String, b: String): Double =
        if (a == b) 1.0 else sims.getOrElse((a, b), sims.getOrElse((b, a), 0.0))
    }
    val q = Array("LA", "Blaine", "BigApple", "Charleston", "Columbia")
    val c1 = Array("LA", "Blain", "Appleton", "Boston", "Denver")
    val c2 = Array("LA", "Blain", "NewYorkCity", "SC", "Miami")
    val so1 = Matching.semanticOverlapDirect(q, c1, simFn, 0.7)
    val so2 = Matching.semanticOverlapDirect(q, c2, simFn, 0.7)
    assert(math.abs(so1 - 1.9) < 1e-9) // LA + Blain(e); Appleton below α
    assert(math.abs(so2 - 3.6) < 1e-9) // LA + Blaine~Blain + BigApple~NYC + Charleston~SC
    assert(so2 > so1)
  }

  test("SO with one-to-one constraint: an element is used at most once") {
    val simFn = new TokenSimilarity {
      def sim(a: String, b: String): Double = if (a.head == b.head) 0.9 else 0.0
    }
    // Both query tokens match the single candidate token: only one edge counts.
    val so = Matching.semanticOverlapDirect(Array("a1", "a2"), Array("a3"), simFn, 0.5)
    assert(math.abs(so - 0.9) < 1e-9)
  }

  test("vanilla overlap is a lower bound for SO (Lemma 1)") {
    val rng = new Random(7)
    val vocab = (0 until 20).map(i => s"w$i").toArray
    val emb = vocab.map(t => t -> Array.fill(8)(rng.nextGaussian().toFloat)).toMap
    val simFn = new EmbeddingCosineSimilarity(emb)
    for (_ <- 1 to 100) {
      val q = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(8)).toArray
      val c = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(8)).toArray
      val vanilla = q.toSet.intersect(c.toSet).size.toDouble
      val so = Matching.semanticOverlapDirect(q, c, simFn, 0.3)
      assert(so >= vanilla - 1e-9)
    }
  }

  test("SO is symmetric") {
    val rng = new Random(8)
    val vocab = (0 until 15).map(i => s"w$i").toArray
    val emb = vocab.map(t => t -> Array.fill(8)(rng.nextGaussian().toFloat)).toMap
    val simFn = new EmbeddingCosineSimilarity(emb)
    for (_ <- 1 to 60) {
      val q = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(6)).toArray
      val c = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(6)).toArray
      val so1 = Matching.semanticOverlapDirect(q, c, simFn, 0.4)
      val so2 = Matching.semanticOverlapDirect(c, q, simFn, 0.4)
      assert(math.abs(so1 - so2) < 1e-9)
    }
  }

  test("full (paper-kernel) and reduced graphs give identical scores") {
    val rng = new Random(15)
    val vocab = (0 until 20).map(i => s"w$i").toArray
    val emb = vocab.map(t => t -> Array.fill(8)(rng.nextGaussian().toFloat)).toMap
    val simFn = new EmbeddingCosineSimilarity(emb)
    for (_ <- 1 to 60) {
      val q = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(8)).toArray
      val c = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(8)).toArray
      val edges = Matching.directEdges(q, simFn, 0.4)
      val reduced = Matching.semanticOverlap(Matching.buildGraph(c, edges))
      val full = Matching.semanticOverlap(Matching.buildFullGraph(q.length, c, edges))
      (reduced, full) match {
        case (Completed(a), Completed(b)) => assert(math.abs(a - b) < 1e-9)
        case other                        => fail(s"unexpected: $other")
      }
    }
  }

  test("full-graph early termination matches reduced-graph semantics") {
    val rng = new Random(16)
    val vocab = (0 until 15).map(i => s"w$i").toArray
    val emb = vocab.map(t => t -> Array.fill(8)(rng.nextGaussian().toFloat)).toMap
    val simFn = new EmbeddingCosineSimilarity(emb)
    for (_ <- 1 to 60) {
      val q = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(6)).toArray
      val c = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(6)).toArray
      val edges = Matching.directEdges(q, simFn, 0.4)
      val so = Matching.semanticOverlapDirect(q, c, simFn, 0.4)
      val theta = rng.nextDouble() * 3
      if (math.abs(so - theta) > 1e-6) {
        val out = Matching.semanticOverlap(Matching.buildFullGraph(q.length, c, edges), theta)
        if (so < theta) assert(out == EarlyTerminated)
        else assert(out.isInstanceOf[Completed])
      }
    }
  }

  test("greedyDirect is a lower bound of semanticOverlapDirect") {
    val rng = new Random(9)
    val vocab = (0 until 15).map(i => s"w$i").toArray
    val emb = vocab.map(t => t -> Array.fill(8)(rng.nextGaussian().toFloat)).toMap
    val simFn = new EmbeddingCosineSimilarity(emb)
    for (_ <- 1 to 60) {
      val q = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(6)).toArray
      val c = rng.shuffle(vocab.toSeq).take(1 + rng.nextInt(6)).toArray
      assert(Matching.greedyDirect(q, c, simFn, 0.4) <=
        Matching.semanticOverlapDirect(q, c, simFn, 0.4) + 1e-9)
    }
  }
}
