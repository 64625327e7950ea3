package repro.core

/** Selection policies of Section 4: which buffered quantities are relayed
  * when the source buffer holds more than the interaction transfers.
  */
sealed trait Policy {
  /** Short name used in benchmark table rows (matches the paper's columns). */
  def label: String
}

object Policy {

  /** §4.1 — transfer the triples with the *smallest* birth time first. */
  case object LeastRecentlyBorn extends Policy { val label = "Least Recently Born" }

  /** §4.1 — transfer the triples with the *largest* birth time first. */
  case object MostRecentlyBorn extends Policy { val label = "Most Recently Born" }

  /** §4.2 — buffers are FIFO queues; least recently received leaves first. */
  case object Fifo extends Policy { val label = "FIFO" }

  /** §4.2 — buffers are stacks; most recently received leaves first. */
  case object Lifo extends Policy { val label = "LIFO" }

  /** All ordered (non-proportional) policies, i.e. those run by
    * [[OrderedEngine]].
    */
  val ordered: Seq[Policy] = Seq(LeastRecentlyBorn, MostRecentlyBorn, Lifo, Fifo)

  /** True for the §4.1 policies that key buffers on generation time. */
  def usesBirthTime(p: Policy): Boolean = p match {
    case LeastRecentlyBorn | MostRecentlyBorn => true
    case _                                    => false
  }
}
