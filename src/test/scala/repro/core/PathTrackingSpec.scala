package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** §6 how-provenance — relay-path tracking on the ordered policies. */
class PathTrackingSpec extends AnyFunSuite {

  private def lifoP() = new OrderedEngine(Policy.Lifo, trackPaths = true)
  private def fifoP() = new OrderedEngine(Policy.Fifo, trackPaths = true)

  private def paths(e: OrderedEngine, v: Long): Vector[(Long, Double, List[Long])] =
    e.provenance(v).map(p => (p.origin, p.quantity, p.path)).toVector

  test("a newborn element's path is just its origin") {
    val e = lifoP()
    e.process(Interaction(3, 4, 1, 2.0))
    assert(paths(e, 4L) === Vector((3L, 2.0, List(3L))))
  }

  test("each relay appends the transmitter") {
    val e = lifoP()
    e.process(Interaction(3, 4, 1, 2.0)) // born at 3, lands at 4
    e.process(Interaction(4, 5, 2, 2.0)) // relayed by 4
    e.process(Interaction(5, 6, 3, 2.0)) // relayed by 5
    assert(paths(e, 6L) === Vector((3L, 2.0, List(3L, 4L, 5L))))
  }

  test("a split copy inherits the parent's route") {
    val e = lifoP()
    e.process(Interaction(3, 4, 1, 5.0))
    e.process(Interaction(4, 5, 2, 5.0)) // path 3→4
    e.process(Interaction(5, 6, 3, 2.0)) // split: 2 units relayed by 5
    assert(paths(e, 6L) === Vector((3L, 2.0, List(3L, 4L, 5L))))
    assert(paths(e, 5L) === Vector((3L, 3.0, List(3L, 4L)))) // remainder unchanged
  }

  test("paths under FIFO follow the queue discipline") {
    val e = fifoP()
    e.process(Interaction(1, 5, 1, 1.0))
    e.process(Interaction(2, 5, 2, 1.0))
    e.process(Interaction(5, 6, 3, 1.0)) // FIFO: the v1-born unit moves
    assert(paths(e, 6L) === Vector((1L, 1.0, List(1L, 5L))))
    assert(paths(e, 5L) === Vector((2L, 1.0, List(2L))))
  }

  test("avgPathLength counts relays past the origin") {
    val e = lifoP()
    e.process(Interaction(3, 4, 1, 2.0)) // len 0
    e.process(Interaction(4, 5, 2, 2.0)) // len 1
    e.process(Interaction(7, 8, 3, 2.0)) // len 0
    assert(math.abs(e.avgPathLength - 0.5) < 1e-9)
  }

  test("path memory is charged per hop") {
    val e = lifoP()
    e.process(Interaction(3, 4, 1, 2.0))
    assert(e.peakPathBytes === 0L) // origin-only path has no hops
    e.process(Interaction(4, 5, 2, 2.0))
    assert(e.peakPathBytes === MemoryModel.PathNodeBytes)
    assert(e.peakEntryBytes === MemoryModel.PairBytes)
  }

  test("path tracking does not change the provenance decomposition") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed, nV = 8, n = 250, intQ = true)
      val plain = new OrderedEngine(Policy.Lifo); plain.processAll(rs)
      val traced = lifoP(); traced.processAll(rs)
      TestTins.assertMapsEqual(TestTins.originTotals(plain), TestTins.originTotals(traced),
                               hint = s"seed $seed")
    }
  }

  test("every stored path starts at the element's origin") {
    (1 to 10).foreach { seed =>
      val rs = TestTins.random(seed + 5, nV = 6, n = 200)
      val e = lifoP(); e.processAll(rs)
      e.snapshot().foreach { case (_, p) =>
        assert(p.path.nonEmpty && p.path.head === p.origin)
      }
    }
  }

  test("path lengths are bounded by the number of interactions") {
    val rs = TestTins.random(17, nV = 4, n = 100)
    val e = lifoP(); e.processAll(rs)
    e.snapshot().foreach { case (_, p) => assert(p.path.length <= 101) }
  }

  test("heavily relayed quantities grow long paths (Flights-like shape)") {
    // Ping-pong a single quantity 30 times: its path must record each hop.
    val e = lifoP()
    e.process(Interaction(0, 1, 0, 1.0, 0))
    (1 to 30).foreach { i =>
      val (s, d) = if (i % 2 == 1) (1L, 2L) else (2L, 1L)
      e.process(Interaction(s, d, i.toLong, 1.0, i.toLong))
    }
    assert(e.avgPathLength === 30.0)
  }

  test("exportQueues refuses path-tracking engines") {
    val e = lifoP()
    e.process(Interaction(1, 2, 0, 1.0))
    intercept[IllegalArgumentException] { e.exportQueues }
  }
}
