package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoints, one per evaluation table / figure of the
  * paper. The sequential-engine tables run on the driver (the paper's
  * setting is single-machine); [[DistributedJob]] exercises the Spark
  * component-parallel path.
  *
  * Usage: `spark-submit --class repro.jobs.Table7And8Job repro-jobs.jar`
  */
object Table6Job {
  def main(args: Array[String]): Unit = println(Tables.table6())
}

/** Tables 7 and 8 share one set of runs (runtime + peak memory). */
object Table7And8Job {
  def main(args: Array[String]): Unit = {
    println(Tables.table7())
    println(Tables.table8())
  }
}

object Table9Job {
  def main(args: Array[String]): Unit = println(Tables.table9())
}

object Table10Job {
  def main(args: Array[String]): Unit = println(Tables.table10())
}

/** Figure 5/6/7 analog sweeps (selective/grouped, cumulative, window). */
object ScalingJob {
  def main(args: Array[String]): Unit = {
    Seq("ctu", "prosper").foreach { d =>
      println(Tables.scalingSweep(d, Seq(8, 32, 128)))
      println(Tables.windowSweep(d, Seq(10_000L, 50_000L)))
    }
  }
}

/** Figure 9 analog — smurfing alerts. args: [dataset] [n] [threshold]. */
object UseCaseJob {
  def main(args: Array[String]): Unit = {
    val dataset = args.lift(0).getOrElse("bitcoin")
    val n = args.lift(1).map(_.toInt).getOrElse(100_000)
    val threshold = args.lift(2).map(_.toDouble).getOrElse(100.0)
    println(Tables.useCase(dataset, n, threshold))
  }
}

/** Component-parallel provenance on Spark. args: [profile] [components]
  * [policy: fifo|lifo|lrb|mrb|sparse].
  */
object DistributedJob {
  import repro.core._
  import repro.dist.DistributedProvenance
  import repro.tin.TinGen

  def main(args: Array[String]): Unit = {
    val profile = TinGen.byName(args.lift(0).getOrElse("taxis"))
    val nComponents = args.lift(1).map(_.toInt).getOrElse(4)
    val makeEngine: DistributedProvenance.EngineFactory = args.lift(2).getOrElse("fifo") match {
      case "fifo"   => () => new OrderedEngine(Policy.Fifo)
      case "lifo"   => () => new OrderedEngine(Policy.Lifo)
      case "lrb"    => () => new OrderedEngine(Policy.LeastRecentlyBorn)
      case "mrb"    => () => new OrderedEngine(Policy.MostRecentlyBorn)
      case "sparse" => () => new ProportionalSparse()
      case other    => sys.error(s"unknown policy: $other")
    }
    val spark = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"tin-provenance-${profile.name}")
      .getOrCreate()
    try {
      val tin = TinGen.generate(spark, profile, nComponents)
      val prov = DistributedProvenance.run(spark, tin, makeEngine)
      val summary = DistributedProvenance.originSummary(prov)
      println(s"provenance rows: ${prov.count()}; (vertex, origin) pairs: ${summary.count()}")
      summary.orderBy(org.apache.spark.sql.functions.desc("quantity")).show(20)
    } finally spark.stop()
  }
}
