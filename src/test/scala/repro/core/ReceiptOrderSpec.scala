package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** §4.2 receipt-order policies — exact reproduction of Table 4 (LIFO,
  * including element order) plus FIFO behaviour (the Figure 1 example)
  * and conservation properties.
  */
class ReceiptOrderSpec extends AnyFunSuite {
  private val R = Interaction.runningExample

  private def lifo() = new OrderedEngine(Policy.Lifo)
  private def fifo() = new OrderedEngine(Policy.Fifo)

  /** Buffer contents as ordered (origin, quantity) pairs (queue order
    * head→tail / stack bottom→top, matching the tables' left→right).
    */
  private def pairs(e: OrderedEngine, v: Long): Vector[(Long, Double)] =
    e.provenance(v).map(p => (p.origin, p.quantity)).toVector

  /** Expected buffers after each interaction (Table 4), in stack order. */
  private val table4: Vector[Map[Long, Vector[(Long, Double)]]] = Vector(
    Map(2L -> Vector((1L, 3.0))),
    Map(0L -> Vector((1L, 3.0), (2L, 2.0))),
    Map(0L -> Vector((1L, 2.0)), 1L -> Vector((1L, 1.0), (2L, 2.0))),
    Map(0L -> Vector((1L, 2.0)), 2L -> Vector((1L, 1.0), (2L, 2.0), (1L, 4.0))),
    Map(0L -> Vector((1L, 2.0)), 1L -> Vector((1L, 2.0)),
        2L -> Vector((1L, 1.0), (2L, 2.0), (1L, 2.0))),
    Map(0L -> Vector((1L, 2.0), (1L, 1.0)), 1L -> Vector((1L, 2.0)),
        2L -> Vector((1L, 1.0), (2L, 2.0), (1L, 1.0))),
  )

  table4.indices.foreach { i =>
    test(s"Table 4 row ${i + 1}: LIFO buffers after interaction ${i + 1}") {
      val e = lifo()
      e.processAll(R.take(i + 1))
      table4(i).foreach { case (v, expected) =>
        assert(pairs(e, v) === expected, s"vertex $v")
      }
      (0L to 2L).filterNot(table4(i).contains).foreach { v =>
        assert(pairs(e, v).isEmpty, s"vertex $v should be empty")
      }
    }
  }

  test("Figure 1: FIFO transfers the front elements, splitting the last") {
    // B_v = [(w,4),(z,3)] built as two newborn arrivals, then ⟨v,u,·,5⟩.
    val e = fifo()
    e.process(Interaction(8, 5, 1, 4.0)) // w=8 → v=5
    e.process(Interaction(9, 5, 2, 3.0)) // z=9 → v=5
    e.process(Interaction(5, 6, 3, 5.0)) // v=5 → u=6, FIFO picks w fully + 1 of z
    assert(pairs(e, 6L) === Vector((8L, 4.0), (9L, 1.0)))
    assert(pairs(e, 5L) === Vector((9L, 2.0)))
  }

  test("LIFO transfers the top element first") {
    val e = lifo()
    e.process(Interaction(8, 5, 1, 4.0))
    e.process(Interaction(9, 5, 2, 3.0))
    e.process(Interaction(5, 6, 3, 2.0)) // top (z=9) split: 2 of its 3
    assert(pairs(e, 6L) === Vector((9L, 2.0)))
    assert(pairs(e, 5L) === Vector((8L, 4.0), (9L, 1.0)))
  }

  test("a transferred LIFO chunk keeps its source orientation") {
    val e = lifo()
    e.process(Interaction(7, 5, 1, 1.0))
    e.process(Interaction(8, 5, 2, 1.0))
    e.process(Interaction(9, 5, 3, 1.0)) // stack: [7,8,9]
    e.process(Interaction(5, 6, 4, 3.0)) // whole stack moves
    assert(pairs(e, 6L) === Vector((7L, 1.0), (8L, 1.0), (9L, 1.0)))
  }

  test("a transferred FIFO chunk arrives in selection order") {
    val e = fifo()
    e.process(Interaction(7, 5, 1, 1.0))
    e.process(Interaction(8, 5, 2, 1.0))
    e.process(Interaction(9, 5, 3, 1.0)) // queue: [7,8,9]
    e.process(Interaction(5, 6, 4, 2.0)) // head two move
    assert(pairs(e, 6L) === Vector((7L, 1.0), (8L, 1.0)))
    assert(pairs(e, 5L) === Vector((9L, 1.0)))
  }

  test("newborn pairs carry no birth time (two-field entries)") {
    val e = lifo()
    e.process(Interaction(1, 2, 5, 3.0))
    val p = e.provenance(2L)
    assert(p.head.birth === -1L)
    assert(e.memory.peakBytes === MemoryModel.PairBytes)
  }

  test("newborn is pushed after the relayed chunk (Table 4 row 2 shape)") {
    val e = lifo()
    e.process(Interaction(1, 2, 1, 3.0))
    e.process(Interaction(2, 0, 3, 5.0))
    assert(pairs(e, 0L) === Vector((1L, 3.0), (2L, 2.0)))
  }

  Seq("LIFO" -> (() => lifo()), "FIFO" -> (() => fifo())).foreach { case (name, mk) =>
    test(s"$name: buffer totals match NoProv on random TINs") {
      (1 to 15).foreach { seed =>
        val rs = TestTins.random(seed, nV = 8, n = 250, intQ = true)
        val a = mk(); a.processAll(rs)
        val b = new NoProv(); b.processAll(rs)
        (0L until 8L).foreach { v =>
          assert(math.abs(a.bufferTotal(v) - b.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
        }
      }
    }

    test(s"$name: provenance sums to the buffer total") {
      (1 to 15).foreach { seed =>
        val rs = TestTins.random(seed + 50, nV = 8, n = 250)
        val e = mk(); e.processAll(rs)
        (0L until 8L).foreach { v =>
          val s = e.provenance(v).map(_.quantity).sum
          assert(math.abs(s - e.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
        }
      }
    }

    test(s"$name: per-origin global totals equal generated quantities") {
      (1 to 15).foreach { seed =>
        val rs = TestTins.random(seed + 300, nV = 6, n = 200, intQ = true)
        val e = mk(); e.processAll(rs)
        val gen = new NoProv(); gen.processAll(rs)
        val byOrigin = e.snapshot().groupBy(_._2.origin).view
          .mapValues(_.map(_._2.quantity).sum).toMap
        (0L until 6L).foreach { o =>
          assert(math.abs(byOrigin.getOrElse(o, 0.0) - gen.generatedBy(o)) < 1e-6,
                 s"seed $seed origin $o")
        }
      }
    }
  }

  test("receipt-order entries cost 16 bytes vs 24 for gen-time (paper §4.2)") {
    val rs = TestTins.random(4, nV = 6, n = 100)
    val a = lifo(); a.processAll(rs)
    val b = new OrderedEngine(Policy.LeastRecentlyBorn); b.processAll(rs)
    // Identical relay structure is not guaranteed across policies, but the
    // per-entry cost ratio must hold for the same element count.
    assert(MemoryModel.PairBytes * 3 === MemoryModel.TripleBytes * 2)
    assert(a.memory.peakBytes > 0 && b.memory.peakBytes > 0)
  }

  // -------- consolidated (Figure-1 / implementation) variant --------

  test("consolidated: at most one entry per origin per buffer") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed, nV = 6, n = 300, intQ = true)
      val e = new OrderedEngine(Policy.Lifo, consolidate = true)
      e.processAll(rs)
      (0L until 6L).foreach { v =>
        val origins = e.provenance(v).map(_.origin)
        assert(origins.distinct.size === origins.size, s"seed $seed v$v")
      }
    }
  }

  test("consolidated: conserves buffer totals and per-origin mass") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed + 40, nV = 8, n = 300, intQ = true)
      val plain = new OrderedEngine(Policy.Fifo); plain.processAll(rs)
      val cons = new OrderedEngine(Policy.Fifo, consolidate = true); cons.processAll(rs)
      (0L until 8L).foreach { v =>
        assert(math.abs(plain.bufferTotal(v) - cons.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
        // NOTE: per-origin decompositions legitimately differ between the
        // two semantics (consolidation changes which units depart first);
        // only the totals are invariant.
        val s = cons.provenance(v).map(_.quantity).sum
        assert(math.abs(s - cons.bufferTotal(v)) < 1e-6, s"seed $seed v$v")
      }
    }
  }

  test("consolidated: merging keeps the existing entry's queue position") {
    val e = new OrderedEngine(Policy.Lifo, consolidate = true)
    e.process(Interaction(1, 5, 1, 2.0))
    e.process(Interaction(2, 5, 2, 3.0))
    e.process(Interaction(1, 5, 3, 4.0)) // merges into the bottom (1,·) entry
    assert(pairs(e, 5L) === Vector((1L, 6.0), (2L, 3.0)))
  }

  test("consolidated: element count is bounded by distinct (vertex, origin) pairs") {
    val rs = TestTins.random(77, nV = 5, n = 500, intQ = true)
    val e = new OrderedEngine(Policy.Lifo, consolidate = true)
    e.processAll(rs)
    assert(e.liveElements <= 5L * 5L)
  }

  test("consolidated is rejected for generation-time policies") {
    intercept[IllegalArgumentException] {
      new OrderedEngine(Policy.LeastRecentlyBorn, consolidate = true)
    }
  }

  test("exportQueues/importQueues round-trips buffer state") {
    val rs = TestTins.random(11, nV = 6, n = 150, intQ = true)
    val (head, tail) = rs.splitAt(75)
    val direct = fifo(); direct.processAll(rs)
    val a = fifo(); a.processAll(head)
    val resumed = fifo().importQueues(a.exportQueues)
    resumed.processAll(tail)
    (0L until 6L).foreach { v =>
      assert(pairs(resumed, v) === pairs(direct, v), s"vertex $v")
    }
  }
}
