package repro.dist

import org.apache.spark.sql.Row
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.{Oracle, SparkSpec}

/** Provenance analytics — every query result is DuckDB-oracled. */
class ProvenanceQueriesSpec extends SparkSpec {

  private def provDf = {
    val schema = StructType(Seq(
      StructField("vertex", LongType), StructField("origin", LongType),
      StructField("quantity", DoubleType), StructField("birth", LongType),
    ))
    spark.createDataFrame(
      spark.sparkContext.parallelize(Seq(
        Row(10L, 1L, 4.0, -1L), Row(10L, 2L, 6.0, -1L), Row(10L, 2L, 2.0, -1L),
        Row(11L, 1L, 1.0, -1L), Row(11L, 3L, 9.0, -1L),
        Row(12L, 12L, 5.0, -1L), Row(12L, 4L, 20.0, -1L),
        Row(13L, 5L, 30.0, -1L),
      )),
      schema,
    ).cache()
  }

  private def edgeDf = {
    val schema = StructType(Seq(StructField("src", LongType), StructField("dst", LongType)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(Seq(
        Row(1L, 10L), Row(2L, 10L), // v10's mass comes from neighbours
        Row(3L, 11L),               // v11 partially
        Row(7L, 12L),               // v12's origins (12 self, 4) are NOT neighbours
        Row(9L, 13L),               // v13's origin 5 is not a neighbour
      )),
      schema,
    ).cache()
  }

  test("totalsByOrigin matches DuckDB") {
    Oracle.assertEquivalent(
      ProvenanceQueries.totalsByOrigin(provDf),
      "SELECT origin, round(sum(CAST(quantity AS DOUBLE)), 6) AS total " +
        "FROM prov GROUP BY origin",
      "prov" -> provDf,
    )
  }

  test("originShares matches DuckDB") {
    Oracle.assertEquivalent(
      ProvenanceQueries.originShares(provDf),
      """WITH agg AS (
        |  SELECT vertex, origin, sum(CAST(quantity AS DOUBLE)) AS q
        |  FROM prov GROUP BY vertex, origin
        |), tot AS (
        |  SELECT vertex, sum(q) AS t FROM agg GROUP BY vertex
        |)
        |SELECT agg.vertex, agg.origin, round(agg.q / tot.t, 6) AS share
        |FROM agg JOIN tot ON agg.vertex = tot.vertex""".stripMargin,
      "prov" -> provDf,
    )
  }

  test("originShares sums to 1 per vertex") {
    val sums = ProvenanceQueries.originShares(provDf)
      .groupBy("vertex").agg(sum("share").as("s")).collect()
    sums.foreach(r => assert(math.abs(r.getDouble(1) - 1.0) < 1e-6))
  }

  test("topContributors(1) picks the heaviest origin per vertex") {
    val top = ProvenanceQueries.topContributors(provDf, 1)
      .select("vertex", "origin").collect()
      .map(r => r.getLong(0) -> r.getLong(1)).toMap
    assert(top === Map(10L -> 2L, 11L -> 3L, 12L -> 4L, 13L -> 5L))
  }

  test("topContributors matches DuckDB") {
    Oracle.assertEquivalent(
      ProvenanceQueries.topContributors(provDf, 2),
      """WITH agg AS (
        |  SELECT vertex, origin, round(sum(CAST(quantity AS DOUBLE)), 6) AS total
        |  FROM prov GROUP BY vertex, origin
        |), ranked AS (
        |  SELECT vertex, origin, total,
        |         row_number() OVER (PARTITION BY vertex ORDER BY total DESC, origin) AS rank
        |  FROM agg
        |)
        |SELECT vertex, origin, total, rank FROM ranked WHERE rank <= 2""".stripMargin,
      "prov" -> provDf,
    )
  }

  test("originCounts matches DuckDB") {
    Oracle.assertEquivalent(
      ProvenanceQueries.originCounts(provDf),
      "SELECT vertex, count(DISTINCT origin) AS norigins FROM prov GROUP BY vertex",
      "prov" -> provDf,
    )
  }

  test("alerts: flags vertices with no neighbour-origin mass above threshold") {
    val got = ProvenanceQueries.alerts(provDf, edgeDf, threshold = 10.0)
      .select("vertex").collect().map(_.getLong(0)).toSet
    // v10 (12 units) has neighbour origins 1,2 → suppressed.
    // v11 (10 units) not above threshold.
    // v12 (25 units): origins {12 (self), 4}; neighbours {7} → alert.
    // v13 (30 units): origin 5; neighbours {9} → alert.
    assert(got === Set(12L, 13L))
  }

  test("alerts: self-origin does not suppress") {
    // v12's own generation (origin 12) must not count as neighbour mass
    // even if a self-edge existed.
    val edges = edgeDf.union(
      spark.createDataFrame(
        spark.sparkContext.parallelize(Seq(Row(12L, 12L))),
        StructType(Seq(StructField("src", LongType), StructField("dst", LongType))),
      )
    )
    val got = ProvenanceQueries.alerts(provDf, edges, threshold = 10.0)
      .select("vertex").collect().map(_.getLong(0)).toSet
    assert(got.contains(12L))
  }

  test("alerts matches DuckDB") {
    Oracle.assertEquivalent(
      ProvenanceQueries.alerts(provDf, edgeDf, threshold = 10.0),
      """WITH tot AS (
        |  SELECT vertex, round(sum(CAST(quantity AS DOUBLE)), 6) AS total
        |  FROM prov GROUP BY vertex
        |  HAVING sum(CAST(quantity AS DOUBLE)) > 10.0
        |), nb AS (
        |  SELECT DISTINCT p.vertex
        |  FROM prov p JOIN (SELECT DISTINCT src, dst FROM edges) e
        |    ON p.vertex = e.dst AND p.origin = e.src
        |  WHERE p.origin <> p.vertex
        |)
        |SELECT vertex, total FROM tot
        |WHERE vertex NOT IN (SELECT vertex FROM nb)""".stripMargin,
      "prov" -> provDf,
      "edges" -> edgeDf,
    )
  }
}
