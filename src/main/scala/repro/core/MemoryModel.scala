package repro.core

/** Analytic memory accounting for the provenance engines.
  *
  * The paper reports peak RSS of a C process; a JVM heap measurement is
  * noisy and GC-dependent, so every engine meters its live provenance
  * state the way the paper's complexity analysis counts it (8 bytes per
  * stored field):
  *
  *   - generation-time triple (o, t, q)        → 24 B
  *   - receipt-order / sparse pair (o, q)      → 16 B
  *   - path node (one vertex id on a path)     →  8 B
  *   - dense provenance vector                 →  8·|V| B, counted when allocated
  *   - NoProv buffer cell                      →  8 B per touched vertex
  *
  * Peak bytes are tracked after every mutation. [[MemoryModel.charge]]
  * throws [[InfeasibleError]] once the accounted live bytes exceed the
  * budget — reproducing the "—" (out-of-memory) cells of Tables 7/8,
  * whose cause on the authors' machine was the 32 GB RAM cap.
  */
final class MemoryModel(val budgetBytes: Long = MemoryModel.DefaultBudgetBytes) {
  private var live = 0L
  private var peakB = 0L

  /** Account `bytes` more (or fewer, if negative) live bytes. */
  def charge(bytes: Long): Unit = {
    live += bytes
    if (live > peakB) {
      peakB = live
      if (peakB > budgetBytes)
        throw new InfeasibleError(
          s"provenance state exceeded the ${budgetBytes / (1024 * 1024)} MB budget"
        )
    }
  }

  def liveBytes: Long = live
  def peakBytes: Long = peakB
}

object MemoryModel {
  /** Field widths, in bytes, mirroring the paper's C structs. */
  val Field: Long = 8L
  val TripleBytes: Long = 3 * Field // (origin, birth, quantity)
  val PairBytes: Long = 2 * Field   // (origin, quantity)
  val PathNodeBytes: Long = Field   // one vertex id on a stored path
  val BufferCellBytes: Long = Field // one |B_v| scalar

  /** Default infeasibility budget at lite scale — the analog of the
    * authors' 32 GB machine, scaled with the ~1–10 % dataset scale.
    */
  val DefaultBudgetBytes: Long = 512L * 1024 * 1024

  /** An effectively unlimited budget, for unit tests. */
  val Unbounded: Long = Long.MaxValue / 4
}

/** Raised when an engine's accounted memory exceeds its budget; benchmark
  * harnesses catch it and print a "—" cell like the paper does.
  */
final class InfeasibleError(msg: String) extends RuntimeException(msg)
