package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** §4.3 proportional selection — exact reproduction of Table 5 (dense
  * vectors), dense ≡ sparse equivalence, and conservation properties.
  */
class ProportionalSpec extends AnyFunSuite {
  private val R = Interaction.runningExample

  /** Expected provenance vectors [p(v0), p(v1), p(v2)] per vertex after
    * each interaction (Table 5; exact fractions, the paper prints two
    * decimals).
    */
  private val table5: Vector[Map[Long, Vector[Double]]] = {
    val x = 2.0 / 7.0 // fraction moved at interaction 5
    Vector(
      Map(2L -> Vector(0, 3, 0.0)),
      Map(0L -> Vector(0, 3, 2.0), 2L -> Vector(0, 0, 0.0)),
      Map(0L -> Vector(0, 1.2, 0.8), 1L -> Vector(0, 1.8, 1.2)),
      Map(0L -> Vector(0, 1.2, 0.8), 1L -> Vector(0, 0, 0.0), 2L -> Vector(0, 5.8, 1.2)),
      Map(0L -> Vector(0, 1.2, 0.8), 1L -> Vector(0, 5.8 * x, 1.2 * x),
          2L -> Vector(0, 5.8 * (1 - x), 1.2 * (1 - x))),
      Map(0L -> Vector(0, 1.2 + 5.8 * (1 - x) / 5.0, 0.8 + 1.2 * (1 - x) / 5.0),
          1L -> Vector(0, 5.8 * x, 1.2 * x),
          2L -> Vector(0, 5.8 * (1 - x) * 0.8, 1.2 * (1 - x) * 0.8)),
    )
  }

  table5.indices.foreach { i =>
    test(s"Table 5 row ${i + 1}: provenance vectors after interaction ${i + 1}") {
      val e = new ProportionalDense(3)
      e.processAll(R.take(i + 1))
      table5(i).foreach { case (v, expected) =>
        val got = e.vector(v)
        expected.indices.foreach { j =>
          assert(math.abs(got(j) - expected(j)) < 1e-9, s"p_v$v[$j]: $got vs $expected")
        }
      }
    }
  }

  test("Table 5 row 5 matches the paper's rounded values") {
    val e = new ProportionalDense(3)
    e.processAll(R.take(5))
    val p1 = e.vector(1L); val p2 = e.vector(2L)
    assert(math.abs(p1(1) - 1.66) < 0.01 && math.abs(p1(2) - 0.34) < 0.01)
    assert(math.abs(p2(1) - 4.14) < 0.01 && math.abs(p2(2) - 0.86) < 0.01)
  }

  test("Table 5 row 6 matches the paper's rounded values") {
    val e = new ProportionalDense(3)
    e.processAll(R)
    val p0 = e.vector(0L); val p2 = e.vector(2L)
    assert(math.abs(p0(1) - 2.03) < 0.01 && math.abs(p0(2) - 0.97) < 0.01)
    assert(math.abs(p2(1) - 3.31) < 0.01 && math.abs(p2(2) - 0.69) < 0.01)
  }

  test("full-buffer transfer moves the whole vector plus the newborn rest") {
    val e = new ProportionalDense(4)
    e.process(Interaction(0, 1, 1, 2.0))
    e.process(Interaction(1, 2, 2, 5.0)) // 2 relayed + 3 newborn at v1
    assert(e.vector(2L) === Vector(2.0, 3.0, 0.0, 0.0))
    assert(e.vector(1L) === Vector(0.0, 0.0, 0.0, 0.0))
  }

  test("proportional split preserves ratios") {
    val e = new ProportionalDense(4)
    e.process(Interaction(0, 2, 1, 6.0))
    e.process(Interaction(1, 2, 2, 3.0)) // p_2 = [6, 3, 0, 0]
    e.process(Interaction(2, 3, 3, 3.0)) // one third of each fragment
    assert(e.vector(3L) === Vector(2.0, 1.0, 0.0, 0.0))
    assert(e.vector(2L) === Vector(4.0, 2.0, 0.0, 0.0))
  }

  test("dense ≡ sparse on the running example") {
    val d = new ProportionalDense(3); d.processAll(R)
    val s = new ProportionalSparse(); s.processAll(R)
    TestTins.assertMapsEqual(TestTins.originTotals(d), TestTins.originTotals(s))
  }

  test("dense ≡ sparse on random TINs") {
    (1 to 20).foreach { seed =>
      val rs = TestTins.random(seed, nV = 12, n = 300)
      val d = new ProportionalDense(12); d.processAll(rs)
      val s = new ProportionalSparse(); s.processAll(rs)
      TestTins.assertMapsEqual(TestTins.originTotals(d), TestTins.originTotals(s),
                               hint = s"seed $seed")
    }
  }

  Seq[(String, Int => ProvenanceEngine)](
    "dense" -> (nV => new ProportionalDense(nV)),
    "sparse" -> (_ => new ProportionalSparse()),
  ).foreach { case (name, mk) =>
    test(s"proportional ($name): buffer totals match NoProv") {
      (1 to 15).foreach { seed =>
        val rs = TestTins.random(seed + 40, nV = 10, n = 250)
        val e = mk(10); e.processAll(rs)
        val b = new NoProv(); b.processAll(rs)
        (0L until 10L).foreach { v =>
          assert(math.abs(e.bufferTotal(v) - b.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
        }
      }
    }

    test(s"proportional ($name): vector sums equal buffer totals") {
      (1 to 15).foreach { seed =>
        val rs = TestTins.random(seed + 80, nV = 10, n = 250)
        val e = mk(10); e.processAll(rs)
        (0L until 10L).foreach { v =>
          val s = e.provenance(v).map(_.quantity).sum
          assert(math.abs(s - e.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
        }
      }
    }

    test(s"proportional ($name): per-origin global totals equal generation") {
      (1 to 15).foreach { seed =>
        val rs = TestTins.random(seed + 120, nV = 8, n = 200)
        val e = mk(8); e.processAll(rs)
        val gen = new NoProv(); gen.processAll(rs)
        val byOrigin = e.snapshot().groupBy(_._2.origin).view
          .mapValues(_.map(_._2.quantity).sum).toMap
        (0L until 8L).foreach { o =>
          assert(math.abs(byOrigin.getOrElse(o, 0.0) - gen.generatedBy(o)) < 1e-5,
                 s"seed $seed origin $o")
        }
      }
    }
  }

  test("dense memory is quadratic: |V| cells per allocated row") {
    val e = new ProportionalDense(100)
    e.process(Interaction(0, 1, 1, 1.0))
    // one row (v1) allocated + the |V| buffer-total cells
    assert(e.memory.peakBytes === 100L * 8 + 100L * MemoryModel.BufferCellBytes)
  }

  test("sparse memory counts only non-zero fragments") {
    val e = new ProportionalSparse()
    e.process(Interaction(0, 1, 1, 1.0))
    e.process(Interaction(2, 1, 2, 1.0))
    assert(e.liveEntries === 2)
    assert(e.memory.peakBytes === 2 * MemoryModel.PairBytes)
  }

  test("sparse entries vanish when a buffer fully drains") {
    val e = new ProportionalSparse()
    e.process(Interaction(0, 1, 1, 2.0))
    e.process(Interaction(1, 2, 2, 2.0)) // v1's list is emptied
    assert(e.provenance(1L).isEmpty)
    assert(e.liveEntries === 1)
  }

  test("sparse avgListLength reflects mixing") {
    val e = new ProportionalSparse()
    e.process(Interaction(0, 9, 1, 1.0))
    e.process(Interaction(1, 9, 2, 1.0))
    e.process(Interaction(2, 9, 3, 1.0))
    assert(e.avgListLength === 3.0) // only v9 has a list, of length 3
  }

  test("budget exhaustion raises InfeasibleError (the paper's '—' cells)") {
    val e = new ProportionalSparse(budgetBytes = 3 * MemoryModel.PairBytes)
    e.process(Interaction(0, 9, 1, 1.0))
    e.process(Interaction(1, 9, 2, 1.0))
    e.process(Interaction(2, 9, 3, 1.0))
    intercept[InfeasibleError] {
      e.process(Interaction(3, 9, 4, 1.0))
    }
  }
}
