package repro.core

import org.scalatest.funsuite.AnyFunSuite

class StatsSpec extends AnyFunSuite {

  private val a = SearchStats(candidates = 10, iubPruned = 6, survivors = 4,
    noEm = 1, emEarlyTerminated = 2, emComputed = 1, finalizeEms = 1,
    streamTuples = 100, refinementMs = 5.0, postprocMs = 7.0, memBytes = 1000,
    thetaLbFinal = 2.5)
  private val b = SearchStats(candidates = 3, iubPruned = 1, survivors = 2,
    noEm = 2, streamTuples = 10, refinementMs = 1.0, postprocMs = 2.0,
    memBytes = 500, thetaLbFinal = 4.0, timedOut = true)

  test("stats sum adds counts element-wise") {
    val s = a + b
    assert(s.candidates == 13)
    assert(s.iubPruned == 7)
    assert(s.survivors == 6)
    assert(s.noEm == 3)
    assert(s.emEarlyTerminated == 2)
    assert(s.emComputed == 1)
    assert(s.finalizeEms == 1)
    assert(s.streamTuples == 110)
    assert(s.memBytes == 1500)
  }

  test("stats sum adds times and takes the max θ_lb") {
    val s = a + b
    assert(math.abs(s.refinementMs - 6.0) < 1e-12)
    assert(math.abs(s.postprocMs - 9.0) < 1e-12)
    assert(s.thetaLbFinal == 4.0)
  }

  test("timedOut propagates through sums") {
    assert((a + b).timedOut)
    assert(!(a + a).timedOut)
  }

  test("totalMs is refinement + post-processing") {
    assert(math.abs(a.totalMs - 12.0) < 1e-12)
  }

  test("zero stats are the neutral element for counts") {
    val z = SearchStats()
    val s = a + z
    assert(s.candidates == a.candidates && s.survivors == a.survivors &&
      s.streamTuples == a.streamTuples)
  }

  test("ScoredSet defaults to exact") {
    assert(ScoredSet(1L, 2.0).exact)
  }
}
