package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.tin.TinGen

/** Benchmark harness plumbing: engine mapping, infeasibility reporting,
  * formatting, and the local generator mirror.
  */
class HarnessSpec extends AnyFunSuite {

  test("engineFor covers every Tables-7/8 column") {
    Harness.PolicyColumns.foreach { c =>
      val e = Harness.engineFor(c, numVertices = 10, budgetBytes = MemoryModel.Unbounded)
      e.process(Interaction(0, 1, 0, 1.0))
      assert(e.bufferTotal(1L) === 1.0, c)
    }
    intercept[RuntimeException] { Harness.engineFor("Bogus", 1, 1L) }
  }

  test("drive reports ok runs with timing and peak memory") {
    val rs = TestTins.random(1, nV = 6, n = 200).toArray
    val r = Harness.runPolicy("FIFO", "test", rs, numVertices = 6)
    assert(r.status === "ok")
    assert(r.timeSec >= 0.0)
    assert(r.peakBytes > 0)
    assert(r.timeCell.matches("""\d+\.\d{3}"""))
    assert(r.memCell.endsWith("B"))
  }

  test("drive reports memory infeasibility as the paper's '—'") {
    val rs = TestTins.random(2, nV = 20, n = 500).toArray
    val r = Harness.runPolicy("PropSparse", "test", rs, numVertices = 20,
                              budgetBytes = 4 * MemoryModel.PairBytes)
    assert(r.status === "mem")
    assert(r.timeCell.startsWith("—"))
    assert(r.memCell.startsWith("—"))
  }

  test("drive enforces the wall-clock budget") {
    val rs = TestTins.random(3, nV = 50, n = 200_000).toArray
    val r = Harness.runPolicy("PropSparse", "test", rs, numVertices = 50,
                              maxSeconds = 0.0)
    assert(r.status === "time")
  }

  test("fmtBytes picks sensible units") {
    assert(Harness.fmtBytes(512) === "512B")
    assert(Harness.fmtBytes(2048) === "2.00KB")
    assert(Harness.fmtBytes(3 * 1024 * 1024) === "3.00MB")
    assert(Harness.fmtBytes(5L * 1024 * 1024 * 1024) === "5.00GB")
  }

  test("markdownTable renders header, rule, and rows") {
    val s = Harness.markdownTable(Seq("a", "b"), Seq(Seq("1", "2"), Seq("3", "4")))
    assert(s === "| a | b |\n|---|---|\n| 1 | 2 |\n| 3 | 4 |\n")
  }

  test("localInteractions is deterministic and profile-shaped") {
    val p = TinGen.taxis.scaled(0.1)
    val a = Harness.localInteractions(p, seed = 5)
    val b = Harness.localInteractions(p, seed = 5)
    assert(a.toSeq === b.toSeq)
    assert(a.length === p.interactions)
    assert(a.forall(r => r.s != r.d))
    assert(a.forall(r => r.s >= 0 && r.s < p.vertices && r.d >= 0 && r.d < p.vertices))
    assert(a.forall(_.q > 0))
  }

  test("localInteractions quantity means track the profiles") {
    val taxi = Harness.localInteractions(TinGen.taxis.scaled(0.2), seed = 9)
    val mTaxi = taxi.map(_.q).sum / taxi.length
    assert(mTaxi > 1.3 && mTaxi < 1.8, s"taxis mean $mTaxi")
    val fl = Harness.localInteractions(TinGen.flights.scaled(0.05), seed = 9)
    val mFl = fl.map(_.q).sum / fl.length
    assert(math.abs(mFl - 125.0) < 10.0, s"flights mean $mFl")
  }

  test("localInteractions endpoints are zipf-skewed for bitcoin") {
    val p = TinGen.bitcoin.scaled(0.005)
    val rs = Harness.localInteractions(p, seed = 11)
    val counts = rs.groupBy(_.s).view.mapValues(_.length).toMap
    val top = counts.values.max
    assert(top > 10.0 * rs.length / p.vertices)
  }
}
