package repro.core

/** Deterministic random TIN streams for property-style tests. */
object TestTins {

  /** `n` interactions among `nV` vertices, quantities in (0, maxQ].
    * `intQ = true` draws integer quantities (exact arithmetic, no float
    * tolerance needed for the ordered policies).
    */
  def random(seed: Long, nV: Int, n: Int, maxQ: Double = 10.0,
             intQ: Boolean = false): Vector[Interaction] = {
    val rnd = new java.util.Random(seed)
    Vector.tabulate(n) { i =>
      val s = rnd.nextInt(nV)
      var d = rnd.nextInt(nV)
      if (d == s) d = (d + 1) % nV
      val q =
        if (intQ) (rnd.nextInt(maxQ.toInt.max(1)) + 1).toDouble
        else rnd.nextDouble() * maxQ + 1e-6
      Interaction(s.toLong, d.toLong, i.toLong, q, i.toLong)
    }
  }

  /** Aggregate an engine's snapshot to (vertex, origin) → quantity. */
  def originTotals(e: ProvenanceEngine): Map[(Long, Long), Double] =
    e.snapshot()
      .groupBy { case (v, entry) => (v, entry.origin) }
      .view
      .mapValues(_.map(_._2.quantity).sum)
      .toMap

  /** Assert two (key → double) maps are equal within `tol` on the union
    * of their supports.
    */
  def assertMapsEqual[K](a: Map[K, Double], b: Map[K, Double], tol: Double = 1e-6,
                         hint: String = ""): Unit = {
    val keys = a.keySet ++ b.keySet
    keys.foreach { k =>
      val x = a.getOrElse(k, 0.0); val y = b.getOrElse(k, 0.0)
      assert(math.abs(x - y) <= tol, s"$hint key $k: $x vs $y")
    }
  }

  /** All seven bench policy engines (dense sized for vertices 0..nV-1). */
  def allEngines(nV: Int): Seq[(String, ProvenanceEngine)] = Seq(
    "NoProv" -> new NoProv(),
    "LRB" -> new OrderedEngine(Policy.LeastRecentlyBorn),
    "MRB" -> new OrderedEngine(Policy.MostRecentlyBorn),
    "LIFO" -> new OrderedEngine(Policy.Lifo),
    "FIFO" -> new OrderedEngine(Policy.Fifo),
    "PropDense" -> new ProportionalDense(nV),
    "PropSparse" -> new ProportionalSparse(),
  )
}
