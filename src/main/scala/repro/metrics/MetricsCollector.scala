package repro.metrics

import scala.collection.mutable

/** One end-to-end latency observation at a sink. */
final case class LatencyObs(atMicros: Long, latencyMicros: Long)

/** Mutable per-run measurement sink. The Runtime and the protocols write
  * into this; [[RunResult]] freezes it at the end of a run.
  *
  * Byte counters and checkpoint statistics are gated to the measurement
  * window [warmupStart, end] by the callers.
  */
final class MetricsCollector {
  /** Payload + framing bytes of data messages sent in the window. */
  var dataBytes: Long = 0L
  /** Protocol bytes: markers, piggybacks, checkpoint metadata, control RPCs. */
  var protoBytes: Long = 0L
  /** Data messages sent in the window. */
  var dataMessages: Long = 0L

  /** Sink latencies (measurement window only). */
  val latencies = mutable.ArrayBuffer.empty[LatencyObs]

  /** Synchronous checkpoint durations (UNC/CIC "checkpointing time"). */
  val ckptSyncMicros = mutable.ArrayBuffer.empty[Long]
  /** COOR: full round durations (its "checkpointing time"). */
  val roundDurationMicros = mutable.ArrayBuffer.empty[Long]
  /** COOR: per-instance alignment (blocked-channel) durations. */
  val alignMicros = mutable.ArrayBuffer.empty[Long]

  /** Exactly-once ledger violations (lost or double-applied sequences). */
  var eoViolations: Long = 0L
  /** Messages dropped by sequence-number deduplication (replay overlap). */
  var dedupDropped: Long = 0L

  /** Records processed by all non-sink operators (throughput accounting). */
  var processedRecords: Long = 0L
  /** Records that reached a sink in the measurement window. */
  var sinkRecords: Long = 0L

  // --- failure/recovery ---
  var failureAt: Option[Long] = None
  var restartMicros: Long = 0L
  var recoveryLineAlgoMicros: Long = 0L
  var replayedMessages: Long = 0L
  var replayedBytes: Long = 0L
  var invalidCounted: Int = 0
  /** Last time any source event was processed with lag > threshold. */
  var lastLaggedAt: Long = 0L

  /** Max backlog observed across instances (stability/backpressure probe). */
  var maxQueuedMessages: Int = 0

  def recordLatency(at: Long, lat: Long): Unit = latencies += LatencyObs(at, lat)
}
