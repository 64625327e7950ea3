package repro.dist

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core._
import repro.tin.TinGen
import scala.collection.mutable

/** End-to-end: generate a TIN → distributed provenance → analytics, with
  * the final-state alert query cross-checked against a local sequential
  * replay.
  */
class EndToEndSpec extends SparkSpec {

  private lazy val profile = TinGen.prosper.scaled(0.005) // 50 vertices, 1540 interactions
  private lazy val tin = TinGen.generate(spark, profile, nComponents = 2).cache()
  private lazy val interactions = TinGen.toInteractions(tin)

  test("pipeline produces a full decomposition of every buffer") {
    val prov = DistributedProvenance.run(spark, tin, () => new ProportionalSparse())
    val perVertex = DistributedProvenance.originSummary(prov)
      .groupBy("vertex").agg(sum("quantity").as("total"))
      .collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    val noProv = new NoProv(); noProv.processAll(interactions)
    noProv.vertices.foreach { v =>
      assert(math.abs(perVertex.getOrElse(v, 0.0) - noProv.bufferTotal(v)) < 1e-5, s"v$v")
    }
  }

  test("batch alert query equals a local final-state evaluation") {
    val prov = DistributedProvenance.run(spark, tin, () => new ProportionalSparse()).toDF()
    val threshold = 200.0
    val got = ProvenanceQueries.alerts(prov, tin.select("src", "dst"), threshold)
      .collect().map(_.getLong(0)).toSet

    // local reference: sequential sparse engine + in-neighbour sets
    val eng = new ProportionalSparse()
    val inNbrs = mutable.Map.empty[Long, mutable.Set[Long]]
    interactions.foreach { r =>
      inNbrs.getOrElseUpdate(r.d, mutable.Set.empty) += r.s
      eng.process(r)
    }
    val expected = eng.vertices.filter { v =>
      eng.bufferTotal(v) > threshold && {
        val nbrs = inNbrs.getOrElse(v, mutable.Set.empty)
        !eng.provenance(v).exists(e => e.origin != v && nbrs.contains(e.origin))
      }
    }.toSet
    assert(got === expected)
  }

  test("top contributors are consistent with origin totals") {
    val prov = DistributedProvenance
      .run(spark, tin, () => new OrderedEngine(Policy.Fifo)).toDF().cache()
    val top1 = ProvenanceQueries.topContributors(prov, 1)
      .select("vertex", "origin", "total").collect()
      .map(r => r.getLong(0) -> (r.getLong(1), r.getDouble(2))).toMap
    val all = prov.groupBy("vertex", "origin").agg(sum("quantity").as("q")).collect()
      .groupBy(_.getLong(0))
    top1.foreach { case (v, (o, t)) =>
      val best = all(v).map(r => (r.getLong(1), r.getDouble(2))).maxBy(x => (x._2, -x._1))
      assert(best._1 === o, s"v$v")
      assert(math.abs(best._2 - t) < 1e-4, s"v$v")
    }
  }

  test("origin shares of the Fig. 2 style distribution are a partition of 1") {
    val prov = DistributedProvenance
      .run(spark, tin, () => new OrderedEngine(Policy.Lifo)).toDF()
    val bad = ProvenanceQueries.originShares(prov)
      .groupBy("vertex").agg(abs(sum("share") - 1.0).as("err"))
      .where(col("err") > 1e-4)
    assert(bad.count() === 0)
  }
}
