package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{Report, TableRuns}

/** Table II — average pruning percentage per filter. Shape targets from the
  * paper: the iUB filter removes the majority of candidates on the skewed
  * corpora (85–91% in the paper), less on Twitter (53.5%); post-processing
  * resolves a sizable share of survivors without any exact matching.
  */
class TableIIBench extends AnyFunSuite {

  test("Table II: average percentage of sets pruned using filters") {
    val (lines, aggs) = TableRuns.tableII()
    Report.emit("table2", lines)

    aggs.foreach { case (name, a) =>
      assert(a.candidates > 0, s"$name: no candidates at all")
      assert(a.iubPct >= 0 && a.iubPct <= 100)
      // survivors partition into the three post-processing outcomes
      assert(math.abs(a.noEm + a.emEarly + a.em - a.survivors) < 1e-6,
        s"$name: survivor accounting broken")
    }
    // Shape: the skewed corpora prune the large majority of candidates in
    // refinement (paper: 85.5–91%); we accept anything above half.
    for (name <- Seq("DBLP", "OpenData", "WDC"))
      assert(aggs(name).iubPct > 50.0,
        s"$name: iUB pruned only ${aggs(name).iubPct}%% of candidates")
    // Shape: exact matchings are a small fraction of candidates for the
    // skewed corpora (paper: <5% reach EM for medium/large queries).
    for (name <- Seq("OpenData", "WDC")) {
      val a = aggs(name)
      assert(a.em / math.max(a.candidates, 1.0) < 0.5,
        s"$name: ${a.em} EMs out of ${a.candidates} candidates — filters not working")
    }
  }
}
