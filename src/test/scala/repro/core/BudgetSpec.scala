package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** §5.3.2 budget-based provenance — the paper's worked example (C = 5,
  * f = 0.6), capacity invariants, mass preservation, shrink statistics.
  */
class BudgetSpec extends AnyFunSuite {

  test("paper worked example: C=5, f=0.6 keeps {u,w,y} and folds 4 into α") {
    // Build p_v = {(v,1),(u,3),(w,2),(z,1)} at vertex 100 via newborn
    // arrivals (v=1, u=2, w=3, z=4), then merge {(x,2),(w,1),(y,4)}
    // (x=5, y=6) in one transfer from a staging vertex.
    val e = new BudgetProvenance(capacity = 5, keepFraction = 0.6)
    e.process(Interaction(1, 100, 1, 1.0, 0))
    e.process(Interaction(2, 100, 2, 3.0, 1))
    e.process(Interaction(3, 100, 3, 2.0, 2))
    e.process(Interaction(4, 100, 4, 1.0, 3))
    // stage {(x,2),(w,1),(y,4)} at vertex 200 (its own capacity is fine: 3 entries)
    e.process(Interaction(5, 200, 5, 2.0, 4))
    e.process(Interaction(3, 200, 6, 1.0, 5))
    e.process(Interaction(6, 200, 7, 4.0, 6))
    // move all 7 units of 200 into 100 → merged size 6 > C=5 → shrink
    e.process(Interaction(200, 100, 8, 7.0, 7))
    val got = e.provenance(100L).map(p => p.origin -> p.quantity).toMap
    assert(got === Map(2L -> 3.0, 3L -> 3.0, 6L -> 4.0, e.Alpha -> 4.0))
    assert(e.shrinksOf(100L) === 1)
    assert(e.shrinksOf(200L) === 0)
  }

  test("list sizes never exceed the capacity C") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed, nV = 10, n = 400)
      val e = new BudgetProvenance(capacity = 4)
      rs.foreach { r =>
        e.process(r)
        (0L until 10L).foreach { v =>
          assert(e.provenance(v).size <= 4, s"seed $seed v$v")
        }
      }
    }
  }

  test("mass is preserved through shrinks (Σ entries = |B_v|)") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed + 30, nV = 10, n = 400)
      val e = new BudgetProvenance(capacity = 3)
      e.processAll(rs)
      (0L until 10L).foreach { v =>
        val s = e.provenance(v).map(_.quantity).sum
        assert(math.abs(s - e.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
      }
    }
  }

  test("a generous capacity equals unbounded sparse provenance") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed + 70, nV = 8, n = 250)
      val e = new BudgetProvenance(capacity = 1000); e.processAll(rs)
      val s = new ProportionalSparse(); s.processAll(rs)
      TestTins.assertMapsEqual(TestTins.originTotals(e), TestTins.originTotals(s),
                               hint = s"seed $seed")
      assert(e.avgShrinks === 0.0)
      assert(e.pctVerticesShrunk === 0.0)
    }
  }

  test("tight capacity shrinks often; stats are consistent") {
    val rs = TestTins.random(99, nV = 12, n = 600)
    val tight = new BudgetProvenance(capacity = 2); tight.processAll(rs)
    val loose = new BudgetProvenance(capacity = 50); loose.processAll(rs)
    assert(tight.avgShrinks > loose.avgShrinks)
    assert(tight.pctVerticesShrunk >= loose.pctVerticesShrunk)
    assert(tight.pctVerticesShrunk <= 100.0)
    assert(tight.avgShrinks >= 0.0)
  }

  test("larger C loses less provenance to α (Table 9 trend)") {
    val rs = TestTins.random(123, nV = 15, n = 800)
    def alphaMass(c: Int): Double = {
      val e = new BudgetProvenance(capacity = c); e.processAll(rs)
      e.snapshot().collect { case (_, p) if p.origin == e.Alpha => p.quantity }.sum
    }
    val m2 = alphaMass(2); val m8 = alphaMass(8); val m64 = alphaMass(64)
    assert(m2 >= m8 - 1e-9)
    assert(m8 >= m64 - 1e-9)
  }

  test("kept entries are the largest quantities") {
    val e = new BudgetProvenance(capacity = 3, keepFraction = 0.6) // keep ⌈1.8⌉=2
    e.process(Interaction(1, 50, 1, 5.0, 0))
    e.process(Interaction(2, 50, 2, 1.0, 1))
    e.process(Interaction(3, 50, 3, 4.0, 2))
    e.process(Interaction(4, 50, 4, 2.0, 3)) // size 4 > 3 → keep {1:5, 3:4}
    val got = e.provenance(50L).map(p => p.origin -> p.quantity).toMap
    assert(got === Map(1L -> 5.0, 3L -> 4.0, e.Alpha -> 3.0))
  }

  test("buffer totals match NoProv under budgeting") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed + 90, nV = 8, n = 300)
      val e = new BudgetProvenance(capacity = 3); e.processAll(rs)
      val b = new NoProv(); b.processAll(rs)
      (0L until 8L).foreach { v =>
        assert(math.abs(e.bufferTotal(v) - b.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
      }
    }
  }

  test("memory stays O(|V|·C)") {
    val rs = TestTins.random(7, nV = 10, n = 500)
    val e = new BudgetProvenance(capacity = 4); e.processAll(rs)
    // transiently a destination list can reach ~2C+1 entries before the
    // post-interaction shrink, hence the 2C+2 factor
    assert(e.memory.peakBytes <= 10 * (2 * 4 + 2) * MemoryModel.PairBytes)
  }

  test("constructor validation") {
    intercept[IllegalArgumentException] { new BudgetProvenance(1) }
    intercept[IllegalArgumentException] { new BudgetProvenance(5, keepFraction = 1.5) }
  }
}
