package repro.core

import scala.collection.mutable

/** Algorithm 1 — basic quantity propagation with no provenance tracking.
  *
  * Each vertex keeps only the scalar |B_v|. Per interaction: relay
  * min(r.q, |B_{r.s}|) buffered units and *generate* the shortfall at the
  * source before transferring it. O(1) time per interaction, O(|V|) space.
  *
  * Besides being the paper's NoProv baseline (Tables 7/8), this engine
  * exposes [[generatedBy]] — the total quantity each vertex generated —
  * which §7.3 uses to pick the top-k contributing vertices for selective
  * provenance.
  */
final class NoProv(budgetBytes: Long = MemoryModel.Unbounded) extends ProvenanceEngine {
  private val buf = mutable.LongMap.empty[Double]
  private val gen = mutable.LongMap.empty[Double]
  val memory = new MemoryModel(budgetBytes)

  /** Quantity generated (born) at the source by the last interaction. */
  var lastGenerated: Double = 0.0

  override def process(r: Interaction): Unit = {
    val bs = buf.getOrElse(r.s, { memory.charge(MemoryModel.BufferCellBytes); 0.0 })
    val relayed = math.min(r.q, bs)
    val born = r.q - relayed
    lastGenerated = born
    buf(r.s) = bs - relayed
    val bd = buf.getOrElse(r.d, { memory.charge(MemoryModel.BufferCellBytes); 0.0 })
    buf(r.d) = bd + r.q
    if (born > 0) gen(r.s) = gen.getOrElse(r.s, 0.0) + born
  }

  override def bufferTotal(v: Long): Double = buf.getOrElse(v, 0.0)

  override def provenance(v: Long): Seq[ProvEntry] = {
    // NoProv does not track origins: the whole buffer is of unknown
    // provenance, reported under the artificial origin α = -1.
    val q = bufferTotal(v)
    if (q > ProvenanceEngine.Eps) Seq(ProvEntry(-1L, q)) else Nil
  }

  override def vertices: Iterator[Long] =
    buf.iterator.collect { case (v, q) if q > ProvenanceEngine.Eps => v }

  /** Total quantity generated at `v` over the whole run. */
  def generatedBy(v: Long): Double = gen.getOrElse(v, 0.0)

  /** The k vertices that generated the largest total quantities
    * (ties broken by vertex id for determinism) — the §7.3 selection.
    */
  def topGenerators(k: Int): Vector[Long] =
    gen.toVector.sortBy { case (v, q) => (-q, v) }.take(k).map(_._1)
}
