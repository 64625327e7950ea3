package repro.dist

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.SparkSpec
import repro.core._
import repro.tin.TinGen

/** Structured-Streaming incremental provenance — multi-batch runs must
  * converge to the batch engine's state.
  */
class StreamingProvenanceSpec extends SparkSpec {

  /** Feed `batches` through a memory stream and return the final
    * snapshot rows (max batch per component).
    */
  private def runStream(policy: Policy, batches: Seq[Seq[TaggedInteraction]],
                        name: String): Map[(Long, Long), Double] = {
    import spark.implicits._
    implicit val sqlCtx = spark.sqlContext
    val input = MemoryStream[TaggedInteraction]
    val out = StreamingProvenance(spark, input.toDS(), policy)
    val query = out.writeStream.format("memory").queryName(name).outputMode("update").start()
    try {
      batches.foreach { b => input.addData(b); query.processAllAvailable() }
      val rows = spark.table(name).as[StreamingProvenance.StreamedProvRow].collect()
      // keep only each component's final snapshot: max batch per vertex set;
      // batch is per-component, so select rows whose batch equals the max
      // batch among rows of the same component… vertices identify components
      // uniquely here because components have disjoint vertex ranges.
      val latestBatch = rows.map(_.batch).max
      val latest = rows.filter(_.batch == latestBatch)
      latest.groupBy(r => (r.vertex, r.origin)).view.mapValues(_.map(_.quantity).sum).toMap
    } finally query.stop()
  }

  private def tagAll(rs: Seq[Interaction], component: Long = 0L): Seq[TaggedInteraction] =
    rs.map(r => TaggedInteraction(r.id, r.t, r.s, r.d, r.q, component))

  test("one batch equals the batch engine (FIFO)") {
    val rs = TestTins.random(1, nV = 8, n = 120, intQ = true)
    val got = runStream(Policy.Fifo, Seq(tagAll(rs)), "sp1")
    val e = new OrderedEngine(Policy.Fifo); e.processAll(rs)
    TestTins.assertMapsEqual(got, TestTins.originTotals(e))
  }

  test("three time-ordered batches equal the batch engine (FIFO)") {
    val rs = TestTins.random(2, nV = 8, n = 150, intQ = true)
    val batches = rs.grouped(50).map(tagAll(_)).toSeq
    val got = runStream(Policy.Fifo, batches, "sp2")
    val e = new OrderedEngine(Policy.Fifo); e.processAll(rs)
    TestTins.assertMapsEqual(got, TestTins.originTotals(e))
  }

  test("three time-ordered batches equal the batch engine (LIFO)") {
    val rs = TestTins.random(3, nV = 8, n = 150, intQ = true)
    val batches = rs.grouped(50).map(tagAll(_)).toSeq
    val got = runStream(Policy.Lifo, batches, "sp3")
    val e = new OrderedEngine(Policy.Lifo); e.processAll(rs)
    TestTins.assertMapsEqual(got, TestTins.originTotals(e))
  }

  test("state is kept per component") {
    // Two independent components in the same stream; each must match its
    // own sequential run.
    val a = TestTins.random(4, nV = 4, n = 60, intQ = true)
    val b = TestTins.random(5, nV = 4, n = 60, intQ = true)
      .map(r => r.copy(s = r.s + 100, d = r.d + 100))
    val mixed = (tagAll(a, 0L) ++ tagAll(b, 1L)).sortBy(_.id)
    val got = runStream(Policy.Fifo, mixed.grouped(40).toSeq, "sp4")
    val ea = new OrderedEngine(Policy.Fifo); ea.processAll(a)
    val eb = new OrderedEngine(Policy.Fifo); eb.processAll(b)
    TestTins.assertMapsEqual(got, TestTins.originTotals(ea) ++ TestTins.originTotals(eb))
  }

  test("streaming refuses non-receipt-order policies") {
    import spark.implicits._
    implicit val sqlCtx = spark.sqlContext
    val input = MemoryStream[TaggedInteraction]
    intercept[IllegalArgumentException] {
      StreamingProvenance(spark, input.toDS(), Policy.LeastRecentlyBorn)
    }
  }

  test("streaming a generated TIN matches the distributed batch run") {
    val df = TinGen.generate(spark, TinGen.taxis.scaled(0.02), nComponents = 2)
    val tagged = DistributedProvenance.tag(spark, df).collect().toSeq.sortBy(_.id)
    val got = runStream(Policy.Fifo, tagged.grouped(200).toSeq, "sp5")
    val batch = DistributedProvenance
      .run(spark, df, () => new OrderedEngine(Policy.Fifo))
      .collect()
      .groupBy(r => (r.vertex, r.origin)).view.mapValues(_.map(_.quantity).sum).toMap
    TestTins.assertMapsEqual(got, batch)
  }
}
