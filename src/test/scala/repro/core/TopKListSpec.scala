package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class TopKListSpec extends AnyFunSuite {

  test("threshold is 0 until the list is full (Lemma 4 init)") {
    val l = new TopKList(3)
    assert(l.threshold == 0.0)
    l.update(1, 5.0)
    l.update(2, 4.0)
    assert(l.threshold == 0.0)
    l.update(3, 3.0)
    assert(l.threshold == 3.0)
  }

  test("threshold is the k-th largest current value") {
    val l = new TopKList(2)
    l.update(1, 1.0); l.update(2, 2.0); l.update(3, 3.0)
    assert(l.threshold == 2.0)
    l.update(4, 5.0)
    assert(l.threshold == 3.0)
  }

  test("raising a tracked id's value updates in place") {
    val l = new TopKList(2)
    l.update(1, 1.0); l.update(2, 2.0)
    l.update(1, 4.0)
    assert(l.threshold == 2.0)
    assert(l.entries.map(_._1) == Seq(1L, 2L))
  }

  test("update returns whether θ_lb changed") {
    val l = new TopKList(2)
    assert(!l.update(1, 1.0)) // list not yet full, θ stays 0
    assert(l.update(2, 2.0)) // full: θ 0 → 1
    assert(!l.update(3, 0.5)) // below bottom: no change
    assert(l.update(3, 3.0)) // evicts 1: θ 1 → 2
  }

  test("an evicted id can re-enter when its value grows") {
    val l = new TopKList(2)
    l.update(1, 1.0); l.update(2, 2.0); l.update(3, 3.0) // evicts 1
    l.update(1, 10.0)
    assert(l.entries.map(_._1).toSet == Set(1L, 3L))
    assert(l.threshold == 3.0)
  }

  test("matches a naive recomputation under random increasing updates") {
    val rng = new Random(50)
    for (k <- Seq(1, 3, 7)) {
      val l = new TopKList(k)
      val truth = scala.collection.mutable.HashMap.empty[Long, Double]
      for (_ <- 1 to 500) {
        val id = rng.nextInt(40).toLong
        val v = math.max(truth.getOrElse(id, 0.0), rng.nextDouble() * 10)
        truth(id) = v
        l.update(id, v)
        val expected =
          if (truth.size < k) 0.0 else truth.values.toSeq.sorted(Ordering[Double].reverse)(k - 1)
        assert(math.abs(l.threshold - expected) < 1e-12,
          s"k=$k: got ${l.threshold}, want $expected")
      }
    }
  }

  test("entries are descending") {
    val rng = new Random(51)
    val l = new TopKList(5)
    (1 to 50).foreach(i => l.update(i.toLong, rng.nextDouble()))
    val vs = l.entries.map(_._2)
    assert(vs == vs.sorted(Ordering[Double].reverse))
    assert(vs.length == 5)
  }
}
