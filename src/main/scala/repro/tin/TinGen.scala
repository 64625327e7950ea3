package repro.tin

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.Interaction

/** Deterministic synthetic TIN generators standing in for the five real
  * datasets of Table 6 (the dumps are not redistributable; see DESIGN.md
  * §4 for the substitution argument). Each profile preserves the paper
  * dataset's vertex count : interaction count ratio, quantity
  * distribution, and endpoint skew, at a lite scale.
  *
  * Output schema: `id` (stream position, also the tie-breaker), `ts`
  * (time, strictly increasing with id), `src`, `dst` (vertex ids,
  * contiguous in `[0, vertices)`), `qty`, `component` (independent
  * sub-network id — interactions never cross components, which gives the
  * distributed layer real parallelism; the single giant component of the
  * real datasets is `nComponents = 1`).
  */
object TinGen {

  /** Quantity distribution of a profile. */
  sealed trait QtyDist
  /** Exponential with the given mean — heavy-tailed transfer amounts. */
  final case class Exponential(mean: Double) extends QtyDist
  /** Uniform in [lo, hi]. */
  final case class Uniform(lo: Double, hi: Double) extends QtyDist
  /** Integer-uniform in [lo, hi] — the Flights passenger counts. Integer
    * granularity matters: buffer fragments bottom out at whole passengers
    * and then relay as whole elements, which is what produces the paper's
    * very long Flights paths (Table 10) at a small element count.
    */
  final case class UniformInt(lo: Int, hi: Int) extends QtyDist
  /** Taxi party sizes: 1–6 passengers, weighted to small parties. */
  case object Passengers extends QtyDist

  /** One synthetic dataset profile (see DESIGN.md §4 for the scales).
    *
    * @param uniformMix   probability an endpoint is drawn uniformly over
    *                     the vertex range instead of from the zipf head —
    *                     real TINs have a few hubs plus a long tail of
    *                     rarely-active vertices
    * @param disjointFrac probability an interaction flows from the
    *                     "source half" to the "sink half" of the vertex
    *                     range — models networks where most quantity is
    *                     freshly generated and rarely relayed onward
    *                     (loans, botnet traffic), which is what keeps the
    *                     paper's Prosper/CTU path lengths below 1
    */
  final case class Profile(
      name: String,
      vertices: Int,
      interactions: Long,
      skewAlpha: Double,
      qty: QtyDist,
      paperVertices: String,
      paperInteractions: String,
      paperAvgQ: String,
      uniformMix: Double = 0.0,
      disjointFrac: Double = 0.0,
  ) {
    /** Uniformly scaled-down copy (≥ 8 vertices, ≥ 1 interaction). */
    def scaled(frac: Double): Profile =
      copy(
        vertices = math.max(8, (vertices * frac).toInt),
        interactions = math.max(1L, (interactions * frac).toLong),
      )
  }

  /** Lite-scale analogs of Table 6 (paper numbers kept for reporting).
    * Mix/disjoint knobs are tuned so the per-dataset *shapes* of Tables
    * 7–10 hold: bitcoin/ctu sparse-infeasible, prosper mostly-newborn
    * (short paths, heavy budget shrinking), flights relay-heavy (very
    * long paths thanks to its huge R:V ratio).
    */
  val bitcoin: Profile =
    Profile("bitcoin", 120_000, 455_000L, 1.1, Exponential(34.4), "12M", "45.5M", "34.4",
            uniformMix = 0.5, disjointFrac = 0.3)
  val ctu: Profile =
    Profile("ctu", 60_800, 280_000L, 1.1, Exponential(19_200.0), "608K", "2.8M", "19.2KB",
            uniformMix = 0.5, disjointFrac = 0.4)
  val prosper: Profile =
    Profile("prosper", 10_000, 308_000L, 1.05, Exponential(76.0), "100K", "3.08M", "76",
            uniformMix = 0.5, disjointFrac = 0.95)
  // Flights keeps 50% of the paper's interactions over the full 629
  // airports: its signature result (avg path length 273, Table 10) is a
  // pure R:V-ratio effect — buffers fragment into ever-smaller elements
  // that each transfer then relays by the dozens — so this is the one
  // profile where R cannot be scaled down aggressively.
  val flights: Profile =
    Profile("flights", 629, 2_850_000L, 0.8, UniformInt(50, 200), "629", "5.7M", "125")
  val taxis: Profile =
    Profile("taxis", 255, 23_100L, 0.8, Passengers, "255", "231K", "1.53")

  val all: Seq[Profile] = Seq(bitcoin, ctu, prosper, flights, taxis)
  def byName(name: String): Profile =
    all.find(_.name == name).getOrElse(sys.error(s"unknown TIN profile: $name"))

  /** Zipf-ish rank draw in [0, n): inverse-CDF over rank weights
    * 1/k^alpha (same scheme as `SynthData.zipfKeys`); rank 0 is hottest.
    */
  private def zipfIdx(n: Int, alpha: Double, seed: Long) = {
    least(
      lit(n.toLong - 1),
      greatest(
        lit(0L),
        (pow(lit(1.0) / (rand(seed) + 1e-9), lit(1.0 / alpha)) - 1.0).cast(LongType),
      ),
    )
  }

  private def qtyCol(dist: QtyDist, seed: Long) = dist match {
    case Exponential(mean)  => -lit(mean) * log(lit(1.0) - rand(seed))
    case Uniform(lo, hi)    => lit(lo) + rand(seed) * (hi - lo)
    case UniformInt(lo, hi) =>
      (lit(lo) + (rand(seed) * (hi - lo + 1)).cast(LongType)).cast("double")
    case Passengers =>
      // P(1..6) = .70/.15/.07/.04/.02/.02 → mean ≈ 1.59 (paper: 1.53)
      val u = rand(seed)
      when(u < 0.70, 1.0)
        .when(u < 0.85, 2.0)
        .when(u < 0.92, 3.0)
        .when(u < 0.96, 4.0)
        .when(u < 0.98, 5.0)
        .otherwise(6.0)
  }

  /** Generate a profile's interaction stream.
    *
    * @param nComponents number of disjoint sub-networks (vertex ranges and
    *                    interactions are partitioned round-robin)
    * @param seed        generator seed — identical inputs for Spark and
    *                    the DuckDB oracle
    */
  def generate(spark: SparkSession, profile: Profile, nComponents: Int = 1,
               seed: Long = 42L): DataFrame = {
    require(nComponents >= 1 && profile.vertices >= 4 * nComponents,
            s"need ≥4 vertices per component")
    val vPerComp = profile.vertices / nComponents
    val halfV = vPerComp / 2
    val base = spark.range(profile.interactions).toDF("id")
    val comp = (col("id") % nComponents).as("component")
    val offset = col("component") * vPerComp

    // endpoint = zipf-head hub or uniform tail vertex, within a range
    def endpoint(lo: Int, size: Int, seed0: Long) = {
      val uniform = least(lit(size.toLong - 1), (rand(seed0 + 10) * size).cast(LongType))
      lit(lo.toLong) +
        when(rand(seed0 + 20) < profile.uniformMix, uniform)
          .otherwise(zipfIdx(size, profile.skewAlpha, seed0))
    }

    val isDisjoint = rand(seed + 30) < profile.disjointFrac
    val srcRaw =
      when(isDisjoint, endpoint(0, halfV, seed))
        .otherwise(endpoint(0, vPerComp, seed))
    val dstRaw =
      when(isDisjoint, endpoint(halfV, vPerComp - halfV, seed + 1))
        .otherwise(endpoint(0, vPerComp, seed + 1))
    base
      .withColumn("component", comp)
      .withColumn("ts", col("id"))
      .withColumn("srcRel", srcRaw)
      .withColumn("dstRel0", dstRaw)
      // self-loops transfer nothing: bump equal endpoints by one (mod n);
      // the disjoint source/sink halves never collide by construction
      .withColumn(
        "dstRel",
        when(col("dstRel0") === col("srcRel"), (col("dstRel0") + 1) % vPerComp)
          .otherwise(col("dstRel0")),
      )
      .select(
        col("id"),
        col("ts"),
        (offset + col("srcRel")).cast(LongType).as("src"),
        (offset + col("dstRel")).cast(LongType).as("dst"),
        round(qtyCol(profile.qty, seed + 2), 6).as("qty"),
        col("component").cast(LongType).as("component"),
      )
  }

  /** Collect a generated TIN into the time-ordered interaction array the
    * sequential engines consume. Lite scales fit comfortably in memory.
    */
  def toInteractions(df: DataFrame): Array[Interaction] =
    df.select("src", "dst", "ts", "qty", "id")
      .collect()
      .map(r => Interaction(r.getLong(0), r.getLong(1), r.getLong(2), r.getDouble(3), r.getLong(4)))
      .sortBy(r => (r.t, r.id))
}
