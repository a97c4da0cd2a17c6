package repro.exp

import org.apache.spark.sql.SparkSession
import repro.streaming.OnlineSTLStreaming

/** Table 2 — distributed-dataflow performance of OnlineSTL vs seasonality
  * (10 / 100 / 1000 / 10000). The paper runs 100K series on a 128-vCPU Flink
  * cluster with checkpointing off and reports throughput per task slot, JVM
  * heap, and total events/s. Our substrate is the Spark `flatMapGroups`
  * dataflow on local[*]; series/point counts are scaled so each row finishes
  * in under ~1 minute while still exercising full init + online phases per
  * key (DESIGN.md substitution 2).
  */
object Table2 {

  final case class Row(seasonality: Int, nSeries: Int, pointsPerSeries: Int,
                       totalPoints: Long, elapsedSec: Double,
                       throughputPerCore: Double, totalEventsPerSec: Double,
                       heapUsedGB: Double)

  /** Paper Table 2 for EXPERIMENTS.md diffing: (throughput/slot, heap GB, total/s). */
  val paper: Map[Int, (Double, Double, Double)] = Map(
    10 -> (85000.0, 24.0, 10.1e6), 100 -> (69000.0, 28.0, 8.3e6),
    1000 -> (25000.0, 36.0, 3.0e6), 10000 -> (3600.0, 108.0, 0.44e6))

  /** Series count per seasonality, scaled to the local box: each series needs
    * 4m init points, so large seasonalities use fewer keys (as in production,
    * where key count × state size is bounded by memory). Small seasonalities
    * get long series — per-point filter cost is tiny there, so short series
    * would measure per-key dataflow overhead instead of the algorithm.
    */
  def defaultConfig(seasonality: Int): (Int, Int) = seasonality match {
    case m if m <= 10   => (500, 10000)
    case m if m <= 100  => (200, 10000)
    case m if m <= 1000 => (64, 8 * m)
    case m              => (16, 5 * m)
  }

  def run(spark: SparkSession, seasonalities: Seq[Int] = Seq(10, 100, 1000, 10000),
          config: Int => (Int, Int) = defaultConfig): Seq[Row] = {
    val cores = spark.sparkContext.defaultParallelism
    // Warm JIT + Catalyst codegen so the first measured row is not charged
    // for compilation (the paper likewise measures steady state). Needs to be
    // big enough that the per-point hot path reaches C2-compiled steady
    // state — a few hundred thousand points.
    for (warmM <- Seq(10, 200))
      OnlineSTLStreaming.decomposeBatch(
        OnlineSTLStreaming.syntheticEvents(spark, 100, 5000, warmM), Seq(warmM)).count()
    seasonalities.map { m =>
      val (nSeries, pts) = config(m)
      val events = OnlineSTLStreaming.syntheticEvents(spark, nSeries, pts, m)
        .repartition(cores).persist()
      val total = nSeries.toLong * pts
      try {
        // Materialize the input first: the source must not be the measured
        // bottleneck (paper §6, "rate of ingestion set high").
        require(events.count() == total)
        val t0 = System.nanoTime()
        val outCount = OnlineSTLStreaming.decomposeBatch(events, Seq(m)).count()
        val sec = (System.nanoTime() - t0) / 1e9
        require(outCount == total, s"expected $total decomposed rows, got $outCount")
        val rt = Runtime.getRuntime
        val heapGB = (rt.totalMemory() - rt.freeMemory()) / 1e9
        Row(m, nSeries, pts, total, sec, total / sec / cores, total / sec, heapGB)
      } finally events.unpersist()
    }
  }

  def format(rows: Seq[Row]): String = {
    val header = f"${"Seasonality"}%11s ${"series"}%7s ${"pts/series"}%10s ${"elapsed_s"}%10s " +
      f"${"thpt/core"}%12s ${"total_ev/s"}%12s ${"heap_GB"}%8s ${"paper thpt/slot"}%15s"
    val body = rows.map { r =>
      val p = paper.get(r.seasonality).map(t => f"${t._1}%.0f").getOrElse("-")
      f"${r.seasonality}%11d ${r.nSeries}%7d ${r.pointsPerSeries}%10d ${r.elapsedSec}%10.2f " +
        f"${r.throughputPerCore}%12.0f ${r.totalEventsPerSec}%12.0f ${r.heapUsedGB}%8.2f $p%15s"
    }
    (header +: body).mkString("\n")
  }
}
