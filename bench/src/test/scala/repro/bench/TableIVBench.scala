package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{Report, TableRuns}

/** Table IV — OpenData pruning counts per query-cardinality interval.
  * Paper shape: candidates grow with query cardinality, and the iUB-filtered
  * fraction grows too, so the share reaching post-processing shrinks.
  */
class TableIVBench extends AnyFunSuite {

  test("Table IV: OpenData #sets pruned by filters per interval") {
    val (lines, perInterval) = TableRuns.tableIV()
    Report.emit("table4", lines)

    val cands = perInterval.map(_._2.candidates)
    // Candidates grow with query cardinality (compare first vs last bucket).
    assert(cands.last > cands.head,
      s"candidates do not grow with cardinality: $cands")
    // The surviving (post-processed) fraction shrinks for large queries.
    val survFrac = perInterval.map { case (_, a) =>
      if (a.candidates == 0) 0.0 else a.survivors / a.candidates
    }
    assert(survFrac.last < survFrac.head,
      s"post-processing share does not shrink: $survFrac")
    // Accounting holds per interval.
    perInterval.foreach { case (label, a) =>
      assert(math.abs(a.candidates - a.iubPruned - a.survivors) < 1e-6, s"$label accounting")
      assert(math.abs(a.noEm + a.emEarly + a.em - a.survivors) < 1e-6, s"$label survivors")
    }
  }
}
