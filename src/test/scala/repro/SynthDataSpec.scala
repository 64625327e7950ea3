package repro

import org.apache.spark.sql.functions._

/** Provided TPC-H-lite generators + the DuckDB oracle plumbing itself. */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() === 6000L)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.001).agg(sum("o_totalprice")).head.getDouble(0)
    val b = SynthData.orders(spark, 0.001).agg(sum("o_totalprice")).head.getDouble(0)
    assert(a === b)
  }

  test("oracle: lineitem aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.0005).cache()
    val q = li
      .groupBy("l_returnflag")
      .agg(count(lit(1)).as("n"), round(sum("l_quantity"), 4).as("sumq"))
    Oracle.assertEquivalent(
      q,
      "SELECT l_returnflag, count(*) AS n, round(sum(CAST(l_quantity AS DOUBLE)), 4) " +
        "AS sumq FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li,
    )
  }

  test("oracle: join query matches DuckDB") {
    val o = SynthData.orders(spark, 0.0005).cache()
    val c = SynthData.customer(spark, 0.0005).cache()
    val q = o
      .join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      q,
      "SELECT c_mktsegment, count(*) AS n FROM orders o JOIN customer c " +
        "ON o.o_custkey = c.c_custkey GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c,
    )
  }

  test("oracle: detects a wrong result") {
    val li = SynthData.lineitem(spark, sf = 0.0002).cache()
    val wrong = li.agg((count(lit(1)) + 1).as("n")) // off by one on purpose
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT count(*) AS n FROM lineitem", "lineitem" -> li)
    }
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
      .groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
      .groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    assert(z > 3 * u, s"zipf top $z vs uniform top $u")
  }
}
