package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Algorithm 1 — exact reproduction of Table 2 plus conservation
  * properties on random TINs.
  */
class NoProvSpec extends AnyFunSuite {
  private val R = Interaction.runningExample

  /** Expected (|B_v0|, |B_v1|, |B_v2|, newborn) after each interaction. */
  private val table2 = Vector(
    (0.0, 0.0, 3.0, 3.0),
    (5.0, 0.0, 0.0, 2.0),
    (2.0, 3.0, 0.0, 0.0),
    (2.0, 0.0, 7.0, 4.0),
    (2.0, 2.0, 5.0, 0.0),
    (3.0, 2.0, 4.0, 0.0),
  )

  table2.indices.foreach { i =>
    test(s"Table 2 row ${i + 1}: buffers after interaction ${i + 1}") {
      val e = new NoProv()
      e.processAll(R.take(i + 1))
      val (b0, b1, b2, born) = table2(i)
      assert(e.bufferTotal(0L) === b0)
      assert(e.bufferTotal(1L) === b1)
      assert(e.bufferTotal(2L) === b2)
      assert(e.lastGenerated === born)
    }
  }

  test("empty engine has empty buffers") {
    val e = new NoProv()
    assert(e.bufferTotal(7L) === 0.0)
    assert(e.vertices.isEmpty)
    assert(e.provenance(7L).isEmpty)
  }

  test("a single interaction generates its full quantity") {
    val e = new NoProv()
    e.process(Interaction(1, 2, 0, 5.0))
    assert(e.lastGenerated === 5.0)
    assert(e.generatedBy(1L) === 5.0)
    assert(e.bufferTotal(2L) === 5.0)
    assert(e.bufferTotal(1L) === 0.0)
  }

  test("relaying a buffered quantity generates nothing") {
    val e = new NoProv()
    e.process(Interaction(1, 2, 0, 5.0))
    e.process(Interaction(2, 3, 1, 3.0))
    assert(e.lastGenerated === 0.0)
    assert(e.bufferTotal(2L) === 2.0)
    assert(e.bufferTotal(3L) === 3.0)
  }

  test("partial shortfall generates exactly the difference") {
    val e = new NoProv()
    e.process(Interaction(1, 2, 0, 5.0))
    e.process(Interaction(2, 3, 1, 8.0))
    assert(e.lastGenerated === 3.0)
    assert(e.generatedBy(2L) === 3.0)
    assert(e.bufferTotal(3L) === 8.0)
  }

  test("total buffered equals total generated (conservation)") {
    (1 to 20).foreach { seed =>
      val rs = TestTins.random(seed, nV = 10, n = 300)
      val e = new NoProv()
      e.processAll(rs)
      val buffered = e.vertices.map(e.bufferTotal).sum
      val generated = (0L until 10L).map(e.generatedBy).sum
      assert(math.abs(buffered - generated) < 1e-6, s"seed $seed")
    }
  }

  test("buffers are never negative") {
    (1 to 20).foreach { seed =>
      val rs = TestTins.random(seed * 31, nV = 6, n = 200)
      val e = new NoProv()
      rs.foreach { r =>
        e.process(r)
        (0L until 6L).foreach(v => assert(e.bufferTotal(v) >= 0.0))
      }
    }
  }

  test("topGenerators ranks by generated quantity, ties by id") {
    val e = new NoProv()
    e.process(Interaction(1, 9, 0, 5.0)) // v1 generates 5
    e.process(Interaction(2, 9, 1, 7.0)) // v2 generates 7
    e.process(Interaction(3, 9, 2, 5.0)) // v3 generates 5 (tie with v1)
    assert(e.topGenerators(2) === Vector(2L, 1L))
    assert(e.topGenerators(10) === Vector(2L, 1L, 3L))
  }

  test("provenance reports the whole buffer under the unknown origin α") {
    val e = new NoProv()
    e.process(Interaction(1, 2, 0, 5.0))
    assert(e.provenance(2L) === Seq(ProvEntry(-1L, 5.0)))
  }

  test("NoProv memory is one cell per touched vertex") {
    val e = new NoProv()
    e.processAll(TestTins.random(7, nV = 5, n = 100))
    assert(e.memory.peakBytes <= 5 * MemoryModel.BufferCellBytes)
    assert(e.memory.peakBytes > 0)
  }
}
