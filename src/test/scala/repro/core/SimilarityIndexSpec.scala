package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class SimilarityIndexSpec extends AnyFunSuite {

  private def clusteredEmbeddings(rng: Random, clusters: Int, perCluster: Int, dim: Int = 8)
      : Map[String, Array[Float]] = {
    (0 until clusters).flatMap { c =>
      val centroid = Array.fill(dim)(rng.nextGaussian())
      (0 until perCluster).map { j =>
        val v = centroid.map(x => (x + rng.nextGaussian() * 0.15).toFloat)
        s"c${c}_$j" -> v
      }
    }.toMap
  }

  test("brute-force index returns descending similarities") {
    val rng = new Random(20)
    val emb = clusteredEmbeddings(rng, 5, 4)
    val vocab = emb.keys.toArray.sorted
    val idx = new BruteForceSimilarityIndex(vocab, new EmbeddingCosineSimilarity(emb))
    for (q <- vocab.take(10)) {
      val ns = idx.neighbors(q, 0.3)
      assert(ns.map(_._2).toSeq == ns.map(_._2).toSeq.sorted(Ordering[Double].reverse))
    }
  }

  test("brute-force index is complete and exact vs direct computation") {
    val rng = new Random(21)
    val emb = clusteredEmbeddings(rng, 6, 3)
    val simFn = new EmbeddingCosineSimilarity(emb)
    val vocab = emb.keys.toArray.sorted
    val idx = new BruteForceSimilarityIndex(vocab, simFn)
    for (q <- vocab) {
      val expected = vocab.map(t => (t, simFn.sim(q, t))).filter(_._2 >= 0.5).toMap
      val got = idx.neighbors(q, 0.5).toMap
      assert(got.keySet == expected.keySet)
      got.foreach { case (t, s) => assert(math.abs(s - expected(t)) < 1e-9) }
    }
  }

  test("self token always first with similarity 1") {
    val rng = new Random(22)
    val emb = clusteredEmbeddings(rng, 4, 3)
    val vocab = emb.keys.toArray.sorted
    val idx = new BruteForceSimilarityIndex(vocab, new EmbeddingCosineSimilarity(emb))
    for (q <- vocab.take(6)) {
      val ns = idx.neighbors(q, 0.8)
      assert(ns.head == ((q, 1.0)))
    }
  }

  test("OOV query token in vocabulary matches only itself (§V OOV rule)") {
    val emb = Map("a" -> Array(1f, 0f, 0f))
    val vocab = Array("a", "oovtok", "b")
    val idx = new BruteForceSimilarityIndex(vocab, new EmbeddingCosineSimilarity(emb))
    assert(idx.neighbors("oovtok", 0.5).toSeq == Seq(("oovtok", 1.0)))
  }

  test("query token absent from vocabulary yields no neighbors") {
    val emb = Map("a" -> Array(1f, 0f))
    val idx = new BruteForceSimilarityIndex(Array("a"), new EmbeddingCosineSimilarity(emb))
    assert(idx.neighbors("ghost", 0.5).isEmpty)
  }

  test("OOV vocabulary tokens never match a different query token") {
    val emb = Map("a" -> Array(1f, 0f))
    val vocab = Array("a", "noVec1", "noVec2")
    val idx = new BruteForceSimilarityIndex(vocab, new EmbeddingCosineSimilarity(emb))
    assert(idx.neighbors("a", 0.1).toSeq == Seq(("a", 1.0)))
  }

  test("generic (non-embedding) similarity path works") {
    val j = new JaccardQGramSimilarity(3)
    val vocab = Array("blaine", "blain", "boston", "blainez")
    val idx = new BruteForceSimilarityIndex(vocab, j)
    val ns = idx.neighbors("blaine", 0.5)
    assert(ns.head == (("blaine", 1.0)))
    assert(ns.map(_._1).contains("blain"))
    assert(!ns.map(_._1).contains("boston"))
  }

  test("alpha threshold is inclusive") {
    val f = new TokenSimilarity {
      def sim(a: String, b: String) = if (a == b) 1.0 else 0.8
    }
    val idx = new BruteForceSimilarityIndex(Array("x", "y"), f)
    assert(idx.neighbors("x", 0.8).length == 2)
    assert(idx.neighbors("x", 0.80001).length == 1)
  }

  test("precomputed index filters by alpha and sorts descending") {
    val idx = new PrecomputedSimilarityIndex(Map(
      "q" -> Array(("a", 0.7), ("b", 0.95), ("c", 0.85))))
    assert(idx.neighbors("q", 0.8).toSeq == Seq(("b", 0.95), ("c", 0.85)))
    assert(idx.neighbors("q", 0.1).map(_._1).toSeq == Seq("b", "c", "a"))
    assert(idx.neighbors("missing", 0.1).isEmpty)
  }

  test("q-gram prefix index agrees with brute force (completeness + exactness)") {
    val j = new JaccardQGramSimilarity(3)
    val rng = new Random(23)
    val vocab = (0 until 80).map(_ => Random.alphanumeric.take(3 + rng.nextInt(8)).mkString)
      .distinct.toArray
    val prefix = new QGramPrefixIndex(vocab, j)
    val brute = new BruteForceSimilarityIndex(vocab, j)
    for (q <- vocab.take(25); alpha <- Seq(0.4, 0.6, 0.8)) {
      val a = prefix.neighbors(q, alpha).toSeq
      val b = brute.neighbors(q, alpha).toSeq
      assert(a == b, s"prefix index differs from brute force for q=$q alpha=$alpha")
    }
  }

  test("q-gram prefix index finds the query token itself") {
    val j = new JaccardQGramSimilarity(3)
    val prefix = new QGramPrefixIndex(Array("alpha", "beta"), j)
    assert(prefix.neighbors("alpha", 0.9).toSeq == Seq(("alpha", 1.0)))
  }

  test("deterministic tie-breaking by token") {
    val f = new TokenSimilarity {
      def sim(a: String, b: String) = if (a == b) 1.0 else 0.9
    }
    val idx = new BruteForceSimilarityIndex(Array("zz", "aa", "mm"), f)
    assert(idx.neighbors("aa", 0.5).map(_._1).toSeq == Seq("aa", "mm", "zz"))
  }
}
