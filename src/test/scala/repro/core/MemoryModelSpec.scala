package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Analytic memory accounting and the interaction model basics. */
class MemoryModelSpec extends AnyFunSuite {

  test("charge accumulates and tracks the peak") {
    val m = new MemoryModel(1000)
    m.charge(100); m.charge(200)
    assert(m.liveBytes === 300 && m.peakBytes === 300)
    m.charge(-250)
    assert(m.liveBytes === 50 && m.peakBytes === 300)
    m.charge(100)
    assert(m.peakBytes === 300) // 150 live < previous peak
  }

  test("exceeding the budget raises InfeasibleError") {
    val m = new MemoryModel(100)
    m.charge(100) // exactly at budget: fine
    intercept[InfeasibleError] { m.charge(1) }
  }

  test("struct widths mirror the paper's entry layouts") {
    assert(MemoryModel.TripleBytes === 24L)
    assert(MemoryModel.PairBytes === 16L)
    assert(MemoryModel.PathNodeBytes === 8L)
  }

  test("interactions reject negative quantities") {
    intercept[IllegalArgumentException] { Interaction(1, 2, 3, -1.0) }
  }

  test("the canonical order is (time, stream position)") {
    val a = Interaction(1, 2, 5, 1.0, id = 2)
    val b = Interaction(1, 2, 5, 1.0, id = 1)
    val c = Interaction(1, 2, 4, 1.0, id = 9)
    assert(Seq(a, b, c).sorted === Seq(c, b, a))
  }

  test("the running example matches Figure 3") {
    val R = Interaction.runningExample
    assert(R.size === 6)
    assert(R.head === Interaction(1, 2, 1, 3.0, 0))
    assert(R.map(_.t) === Vector(1L, 3L, 4L, 5L, 7L, 8L))
    assert(R.map(_.q).sum === 21.0)
  }

  test("engines propagate InfeasibleError mid-run") {
    val e = new OrderedEngine(Policy.Fifo, budgetBytes = 2 * MemoryModel.PairBytes)
    e.process(Interaction(1, 2, 0, 1.0, 0))
    e.process(Interaction(3, 2, 1, 1.0, 1))
    intercept[InfeasibleError] { e.process(Interaction(4, 2, 2, 1.0, 2)) }
  }
}
