package repro.core

/** A single interaction of a temporal interaction network (Definition 1).
  *
  * @param s  source vertex
  * @param d  destination vertex
  * @param t  time the interaction took place (any monotone clock)
  * @param q  transferred quantity (must be > 0)
  * @param id tie-breaker: position of the interaction in the input stream.
  *           The paper assumes a total time order; real timestamps can
  *           collide, so `(t, id)` is the canonical processing order.
  */
final case class Interaction(s: Long, d: Long, t: Long, q: Double, id: Long = 0L) {
  require(q >= 0.0, s"negative quantity in interaction $this")
}

object Interaction {

  /** The canonical processing order used by every engine: time, then
    * stream position for equal timestamps.
    */
  implicit val timeOrdering: Ordering[Interaction] =
    Ordering.by((r: Interaction) => (r.t, r.id))

  /** Convenience constructor for hand-written examples (id = running index
    * is irrelevant when all timestamps are distinct).
    */
  def seq(rs: (Long, Long, Long, Double)*): Vector[Interaction] =
    rs.zipWithIndex.map { case ((s, d, t, q), i) => Interaction(s, d, t, q, i.toLong) }.toVector

  /** The paper's running example (Figure 3): six interactions among
    * vertices v0, v1, v2. Used by the Table 2–5 worked-example tests.
    */
  val runningExample: Vector[Interaction] = seq(
    (1L, 2L, 1L, 3.0),
    (2L, 0L, 3L, 5.0),
    (0L, 1L, 4L, 3.0),
    (1L, 2L, 5L, 7.0),
    (2L, 1L, 7L, 2.0),
    (2L, 0L, 8L, 1.0),
  )
}
