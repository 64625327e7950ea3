package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** §5.1 selective and §5.2 grouped provenance — both must equal the full
  * proportional result projected onto their slot structure.
  */
class SelectiveGroupedSpec extends AnyFunSuite {
  private val R = Interaction.runningExample

  private def denseTotals(rs: Seq[Interaction], nV: Int): Map[(Long, Long), Double] = {
    val d = new ProportionalDense(nV); d.processAll(rs)
    TestTins.originTotals(d)
  }

  // ---------------- selective ----------------

  test("selective with all vertices tracked equals full proportional") {
    val e = new SelectiveProvenance(Seq(0L, 1L, 2L))
    e.processAll(R)
    TestTins.assertMapsEqual(TestTins.originTotals(e), denseTotals(R, 3))
  }

  test("selective folds untracked origins into α") {
    val e = new SelectiveProvenance(Seq(1L)) // track only v1
    e.processAll(R)
    val full = denseTotals(R, 3)
    (0L to 2L).foreach { v =>
      val sel = e.provenance(v).map(p => p.origin -> p.quantity).toMap
      val expTracked = full.getOrElse((v, 1L), 0.0)
      val expOther = (0L to 2L).filter(_ != 1L).map(o => full.getOrElse((v, o), 0.0)).sum
      assert(math.abs(sel.getOrElse(1L, 0.0) - expTracked) < 1e-9, s"v$v tracked")
      assert(math.abs(sel.getOrElse(-1L, 0.0) - expOther) < 1e-9, s"v$v other")
    }
  }

  test("selective equals projected dense on random TINs") {
    (1 to 15).foreach { seed =>
      val rs = TestTins.random(seed, nV = 10, n = 250)
      val tracked = Seq(0L, 3L, 7L)
      val e = new SelectiveProvenance(tracked); e.processAll(rs)
      val full = denseTotals(rs, 10)
      (0L until 10L).foreach { v =>
        val sel = e.provenance(v).map(p => p.origin -> p.quantity).toMap
        tracked.foreach { o =>
          assert(math.abs(sel.getOrElse(o, 0.0) - full.getOrElse((v, o), 0.0)) < 1e-6,
                 s"seed $seed v$v origin $o")
        }
        val other = (0L until 10L).filterNot(tracked.contains)
          .map(o => full.getOrElse((v, o), 0.0)).sum
        assert(math.abs(sel.getOrElse(-1L, 0.0) - other) < 1e-6, s"seed $seed v$v α")
      }
    }
  }

  test("selective vector length is k+1 slots (space O(k·|V|))") {
    val e = new SelectiveProvenance(Seq(5L, 6L))
    assert(e.numSlots === 3)
    e.process(Interaction(1, 2, 0, 4.0))
    // one row + one buffer cell charged
    assert(e.memory.peakBytes === 3 * MemoryModel.Field + MemoryModel.BufferCellBytes)
  }

  test("selective buffer totals match NoProv") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed + 500, nV = 9, n = 200)
      val e = new SelectiveProvenance(Seq(2L)); e.processAll(rs)
      val b = new NoProv(); b.processAll(rs)
      (0L until 9L).foreach { v =>
        assert(math.abs(e.bufferTotal(v) - b.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
      }
    }
  }

  // ---------------- grouped ----------------

  test("grouped with singleton groups equals full proportional") {
    val e = new GroupedProvenance(3, v => v.toInt)
    e.processAll(R)
    TestTins.assertMapsEqual(TestTins.originTotals(e), denseTotals(R, 3))
  }

  test("grouped equals group-summed dense on random TINs") {
    (1 to 15).foreach { seed =>
      val rs = TestTins.random(seed + 60, nV = 12, n = 250)
      val groupOf = (v: Long) => (v % 4).toInt // round-robin, as in §7.3
      val e = new GroupedProvenance(4, groupOf); e.processAll(rs)
      val full = denseTotals(rs, 12)
      (0L until 12L).foreach { v =>
        val got = e.provenance(v).map(p => p.origin -> p.quantity).toMap
        (0 until 4).foreach { g =>
          val exp = (0L until 12L).filter(o => groupOf(o) == g)
            .map(o => full.getOrElse((v, o), 0.0)).sum
          assert(math.abs(got.getOrElse(g.toLong, 0.0) - exp) < 1e-6,
                 s"seed $seed v$v group $g")
        }
      }
    }
  }

  test("grouped with one group attributes everything to it") {
    val e = new GroupedProvenance(1, _ => 0)
    e.processAll(R)
    (0L to 2L).foreach { v =>
      val p = e.provenance(v)
      if (e.bufferTotal(v) > 0) {
        assert(p.map(_.origin).toSet === Set(0L))
        assert(math.abs(p.map(_.quantity).sum - e.bufferTotal(v)) < 1e-9)
      }
    }
  }

  test("grouped buffer totals match NoProv") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed + 700, nV = 9, n = 200)
      val e = new GroupedProvenance(3, v => (v % 3).toInt); e.processAll(rs)
      val b = new NoProv(); b.processAll(rs)
      (0L until 9L).foreach { v =>
        assert(math.abs(e.bufferTotal(v) - b.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
      }
    }
  }
}
