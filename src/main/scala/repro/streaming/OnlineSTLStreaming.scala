package repro.streaming

import org.apache.spark.sql.{Dataset, Encoder, Encoders, SparkSession}
import org.apache.spark.sql.streaming.{GroupState, GroupStateTimeout, OutputMode}
import repro.core.OnlineSTL
import repro.data.TimeSeriesGen

/** A single metric observation on the stream: one value of one time series. */
final case class MetricEvent(seriesId: Long, ts: Long, value: Double)

/** One decomposed point, flattened for Spark SQL friendliness.
  * `seasonals` is per-period; `seasonal` is their sum.
  */
final case class DecompRow(
    seriesId: Long, ts: Long, value: Double,
    trend: Double, seasonals: Seq[Double], seasonal: Double, residual: Double)

/** OnlineSTL as a Spark dataflow — the reproduction of the paper's Flink
  * deployment (§6). The paper runs OnlineSTL as a *stateful keyed map*; the
  * Spark Structured Streaming analogue is `flatMapGroupsWithState` keyed by
  * series id with an [[OnlineSTL]] instance as managed state. A batch
  * `flatMapGroups` variant runs the identical per-key code path without
  * micro-batch state-store overhead and is what the Table-2 throughput bench
  * uses (the paper likewise disables checkpointing when measuring
  * throughput).
  */
object OnlineSTLStreaming {

  /** Per-key processing shared by the batch and streaming paths: feed events
    * in timestamp order into the keyed OnlineSTL state.
    */
  private def processKey(key: Long, events: Iterator[MetricEvent],
                         stl: OnlineSTL): Iterator[DecompRow] = {
    val sorted = events.toArray.sortBy(_.ts)
    sorted.iterator.flatMap { e =>
      stl.push(e.value).map { p =>
        // p.index counts points within the series; init back-fill points map
        // onto the earliest timestamps of this key.
        val ts = e.ts - (stl.pointsSeen - 1 - p.index)
        DecompRow(key, ts, p.value, p.trend, p.seasonals.toSeq, p.seasonalSum, p.residual)
      }
    }
  }

  /** Structured Streaming decomposition: keyed state = serialized OnlineSTL
    * (the analogue of Flink managed keyed state; serialization per
    * micro-batch mirrors Flink state backends).
    */
  def decomposeStream(events: Dataset[MetricEvent], periods: Seq[Int]): Dataset[DecompRow] = {
    val spark = events.sparkSession
    import spark.implicits._
    implicit val stlEnc: Encoder[OnlineSTL] = Encoders.javaSerialization[OnlineSTL]
    events
      .groupByKey(_.seriesId)
      .flatMapGroupsWithState(OutputMode.Append, GroupStateTimeout.NoTimeout) {
        (key: Long, it: Iterator[MetricEvent], state: GroupState[OnlineSTL]) =>
          val stl = state.getOption.getOrElse(new OnlineSTL(periods))
          val out = processKey(key, it, stl).toVector
          state.update(stl)
          out.iterator
      }
  }

  /** Batch dataflow over a bounded event set — same per-key code path, used
    * for throughput measurement.
    */
  def decomposeBatch(events: Dataset[MetricEvent], periods: Seq[Int]): Dataset[DecompRow] = {
    val spark = events.sparkSession
    import spark.implicits._
    events
      .groupByKey(_.seriesId)
      .flatMapGroups { (key: Long, it: Iterator[MetricEvent]) =>
        processKey(key, it, new OnlineSTL(periods))
      }
  }

  /** Deterministic synthetic metric stream: `nSeries` keys, `pointsPerSeries`
    * points each, seasonal with the given period (generated inside the
    * dataflow from (seriesId, ts) so generation cost is negligible).
    */
  def syntheticEvents(spark: SparkSession, nSeries: Int, pointsPerSeries: Int,
                      period: Int): Dataset[MetricEvent] = {
    import spark.implicits._
    val pps = pointsPerSeries.toLong
    spark.range(nSeries * pps).map { id =>
      val s = id / pps; val t = id % pps
      MetricEvent(s, t, TimeSeriesGen.metricPoint(s, t, period))
    }
  }
}
