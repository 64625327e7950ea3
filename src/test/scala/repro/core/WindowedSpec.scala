package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** §5.3.1 windowing approach — reset cadence, the W-interaction
  * provenance guarantee, and bounded list growth.
  */
class WindowedSpec extends AnyFunSuite {

  test("before the first reset the window tracks full provenance") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed, nV = 8, n = 90)
      val w = new WindowedProvenance(window = 100); w.processAll(rs) // 90 < W
      val s = new ProportionalSparse(); s.processAll(rs)
      TestTins.assertMapsEqual(TestTins.originTotals(w), TestTins.originTotals(s),
                               hint = s"seed $seed")
    }
  }

  test("W larger than the stream never loses provenance") {
    val rs = TestTins.random(3, nV = 6, n = 200)
    val w = new WindowedProvenance(window = 10_000); w.processAll(rs)
    val s = new ProportionalSparse(); s.processAll(rs)
    TestTins.assertMapsEqual(TestTins.originTotals(w), TestTins.originTotals(s))
  }

  test("after an odd multiple of W the odd store holds only α mass") {
    val rs = TestTins.random(5, nV = 6, n = 100)
    val w = new WindowedProvenance(window = 100)
    w.processAll(rs) // exactly W interactions → odd store was just reset
    // The active (queryable) store must be the even one — still exact.
    val s = new ProportionalSparse(); s.processAll(rs)
    TestTins.assertMapsEqual(TestTins.originTotals(w), TestTins.originTotals(s))
  }

  test("provenance sums always equal buffer totals, resets included") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed + 10, nV = 8, n = 350)
      val w = new WindowedProvenance(window = 50)
      rs.foreach { r =>
        w.process(r)
        (0L until 8L).foreach { v =>
          val s = w.provenance(v).map(_.quantity).sum
          assert(math.abs(s - w.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
        }
      }
    }
  }

  test("a quantity born after the active store's reset is exactly attributed") {
    // W = 4. Interactions 1..4 pump quantity around among v0..v2; at
    // interaction 4 the odd store resets (multiple 1), so the active
    // store is even (never reset yet). A quantity born at v9 afterwards
    // must be attributed to v9 wherever it travels.
    val w = new WindowedProvenance(window = 4)
    val churn = Seq(
      Interaction(0, 1, 0, 2.0, 0), Interaction(1, 2, 1, 2.0, 1),
      Interaction(2, 0, 2, 2.0, 2), Interaction(0, 1, 3, 2.0, 3),
    )
    churn.foreach(w.process)
    w.process(Interaction(9, 5, 4, 7.0, 4)) // newborn at v9 → v5
    w.process(Interaction(5, 6, 5, 3.0, 5)) // relay part of it to v6
    val p6 = w.provenance(6L).map(p => p.origin -> p.quantity).toMap
    assert(math.abs(p6.getOrElse(9L, 0.0) - 3.0) < 1e-9)
    val p5 = w.provenance(5L).map(p => p.origin -> p.quantity).toMap
    assert(math.abs(p5.getOrElse(9L, 0.0) - 4.0) < 1e-9)
  }

  test("quantities older than 2W may degrade to α, but mass is kept") {
    val w = new WindowedProvenance(window = 2)
    w.process(Interaction(7, 5, 0, 4.0, 0)) // born at v7
    // six churn interactions elsewhere trigger three resets
    (1 to 6).foreach(i => w.process(Interaction(0, 1, i.toLong, 1.0, i.toLong)))
    val p5 = w.provenance(5L)
    assert(math.abs(p5.map(_.quantity).sum - 4.0) < 1e-9)
    assert(p5.map(_.origin).toSet === Set(w.Alpha)) // provenance aged out
  }

  test("resets bound the live entry count") {
    val rs = TestTins.random(9, nV = 6, n = 400)
    val w = new WindowedProvenance(window = 20)
    var maxEntries = 0L
    rs.foreach { r => w.process(r); maxEntries = math.max(maxEntries, w.liveEntries) }
    val unbounded = new ProportionalSparse(); unbounded.processAll(rs)
    // Two stores, each bounded by churn since its last reset; must stay
    // well under twice the unbounded engine's peak.
    assert(maxEntries <= 2 * unbounded.peakEntries)
    assert(w.liveEntries > 0)
  }

  test("buffer totals match NoProv under windowing") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed + 20, nV = 8, n = 300)
      val w = new WindowedProvenance(window = 30); w.processAll(rs)
      val b = new NoProv(); b.processAll(rs)
      (0L until 8L).foreach { v =>
        assert(math.abs(w.bufferTotal(v) - b.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
      }
    }
  }

  test("window must be positive") {
    intercept[IllegalArgumentException] { new WindowedProvenance(0) }
  }
}
