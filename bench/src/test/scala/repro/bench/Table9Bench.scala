package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 9 — shrinking statistics of budget-based provenance. */
class Table9Bench extends AnyFunSuite {

  test("Table 9: budget shrinking statistics") {
    println(Tables.table9())
  }

  test("Table 9 shape: larger budgets shrink less") {
    Seq("bitcoin", "ctu", "prosper").foreach { d =>
      val cs = Tables.table9Cs(d)
      // The paper's own columns are not strictly monotone row-to-row
      // (CTU bumps at C=200); require the end-to-end trend instead.
      val shrinks = cs.map(c => Tables.runTable9(d, c).avgShrinks)
      assert(shrinks.last <= shrinks.head + 1e-9, s"$d: $shrinks")
      val pcts = cs.map(c => Tables.runTable9(d, c).pctVerticesShrunk)
      assert(pcts.last <= pcts.head + 1e-9, s"$d: $pcts")
    }
  }

  test("Table 9 shape: the dense small-V network shrinks most (prosper)") {
    // Paper: Prosper has the highest % of shrunk vertices at C=10
    // because its R/V ratio (mixing) is the largest of the three.
    val prosper = Tables.runTable9("prosper", 10)
    val bitcoin = Tables.runTable9("bitcoin", 10)
    assert(prosper.pctVerticesShrunk > bitcoin.pctVerticesShrunk)
  }
}
