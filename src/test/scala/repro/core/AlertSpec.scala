package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** §7.6 use case — alerts on accumulation with no neighbour-origin mass. */
class AlertSpec extends AnyFunSuite {
  import AlertUseCase._

  test("no alert when mass originates from a direct neighbour") {
    // v1 generates and sends directly to v9: origin v1 IS a neighbour.
    val rs = Interaction.seq((1L, 9L, 1L, 20.0))
    assert(AlertUseCase.run(rs, threshold = 10.0).isEmpty)
  }

  test("alert fires when neighbours only relay") {
    // v1 generates at distance two: v1 → v2 → v9. v9's only neighbour is
    // v2, but all of v9's mass originates from v1.
    val rs = Interaction.seq(
      (1L, 2L, 1L, 20.0),
      (2L, 9L, 2L, 20.0),
    )
    val alerts = AlertUseCase.run(rs, threshold = 10.0)
    assert(alerts.map(a => (a.vertex, a.interactionIdx)) === Vector((9L, 1L)))
    assert(alerts.head.buffered === 20.0)
    assert(alerts.head.numOrigins === 1)
    assert(alerts.head.fewSources)
  }

  test("no alert below the threshold") {
    val rs = Interaction.seq(
      (1L, 2L, 1L, 5.0),
      (2L, 9L, 2L, 5.0),
    )
    assert(AlertUseCase.run(rs, threshold = 10.0).isEmpty)
  }

  test("self-generated mass does not count as neighbour provenance") {
    // v9 first sends away (generating at v9), then receives relayed mass
    // originating from v9 itself via v2: the only origin is v9, which is
    // not an external neighbour contribution → alert.
    val rs = Interaction.seq(
      (9L, 2L, 1L, 20.0),
      (2L, 9L, 2L, 20.0),
    )
    val alerts = AlertUseCase.run(rs, threshold = 10.0)
    assert(alerts.map(_.vertex) === Vector(9L))
    assert(alerts.head.numOrigins === 0)
  }

  test("many distant origins produce a non-few-sources alert") {
    // Six generators far from v9, each relayed through v7.
    val gens = (1 to 6).map(i => (10L + i, 7L, i.toLong, 5.0))
    val relay = Seq((7L, 9L, 10L, 30.0))
    val alerts = AlertUseCase.run(Interaction.seq(gens ++ relay: _*), threshold = 10.0)
    assert(alerts.map(_.vertex) === Vector(9L))
    assert(alerts.head.numOrigins === 6)
    assert(!alerts.head.fewSources) // blue dot: possible smurfing
  }

  test("alerts re-fire as the buffer keeps growing") {
    val rs = Interaction.seq(
      (1L, 2L, 1L, 20.0),
      (2L, 9L, 2L, 20.0), // alert 1
      (1L, 3L, 3L, 20.0),
      (3L, 9L, 4L, 20.0), // alert 2
    )
    val alerts = AlertUseCase.run(rs, threshold = 10.0)
    assert(alerts.map(_.interactionIdx) === Vector(1L, 3L))
  }

  test("mixed provenance: any neighbour-origin mass suppresses the alert") {
    val rs = Interaction.seq(
      (1L, 2L, 1L, 20.0),
      (2L, 9L, 2L, 20.0), // alert (origin v1, neighbour v2)
      (3L, 9L, 3L, 1.0),  // v3 generates directly → neighbour origin mass
    )
    val alerts = AlertUseCase.run(rs, threshold = 10.0)
    assert(alerts.map(_.interactionIdx) === Vector(1L))
  }
}
