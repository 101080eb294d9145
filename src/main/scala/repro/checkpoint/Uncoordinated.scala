package repro.checkpoint

import repro.dataflow._

/** Uncoordinated checkpointing (UNC, paper §III-B): every instance
  * snapshots on its own jittered timer, with no markers and no blocking.
  *
  * Exactly-once needs the full log-based machinery: sender-side in-flight
  * message logging (upstream backup), per-channel sequence deduplication on
  * replay, and the rollback-propagation algorithm over the checkpoint
  * graph to find a consistent recovery line. Checkpoint metadata (the seq
  * vectors) is shipped to the coordinator — the protocol's only message
  * overhead, which Table II shows to be insignificant.
  *
  * Every instance checkpoints so replay stays bounded, but stateless
  * operators and sinks snapshot only channel-position metadata at ~zero
  * cost (and outside the counted totals), reflecting the paper's point
  * that stateless non-source operators need not participate.
  */
class Uncoordinated extends Protocol {
  def name = "UNC"
  def features: ProtocolFeatures = ProtocolFeatures(
    blockingMarkers = false, inFlightLogging = true, deduplicationRequired = true,
    messageOverhead = false, independentCheckpoints = true, stragglerStalls = false,
    unusedCheckpoints = true, forcedCheckpoints = false)
  def logsMessages = true
  def supportsCycles = true

  /** Checkpoint-metadata RPC to the coordinator: header + seq vectors. */
  protected def metaRpcBytes(meta: CkptMeta): Long =
    32L + 8L * (meta.lastSent.size + meta.lastReceived.size)

  protected var rt: ProtocolRuntime = _

  def init(r: ProtocolRuntime): Unit = rt = r

  def onStart(): Unit = {
    val rnd = new scala.util.Random(rt.cfg.seed ^ 0x5ca1ab1e)
    val interval = rt.cfg.localIntervalMicros
    // Deterministic per-instance phase jitter spreads checkpoints in time.
    rt.graph.instances.foreach { id =>
      val phase = 1L + math.abs(rnd.nextLong()) % interval
      rt.scheduleTimer(phase, "unc.local", Some(id), 0L)
    }
  }

  def onTimer(tag: String, inst: Option[InstanceId], payload: Long, now: Long): Unit = tag match {
    case "unc.local" =>
      val id = inst.getOrElse(sys.error("local timer without instance"))
      rt.requestCheckpoint(id, LocalCkpt)
      val next = now + rt.cfg.localIntervalMicros
      if (next <= rt.endMicros) rt.scheduleTimer(next, "unc.local", Some(id), 0L)
    case other => sys.error(s"unexpected timer $other")
  }

  def piggybackFor(sender: InstanceId, channel: ChannelId, now: Long): Option[Piggyback] = None
  def beforeApply(inst: Instance, msg: Msg, now: Long): Boolean = false
  def onMarker(inst: Instance, channel: ChannelId, round: Int, now: Long): Unit =
    sys.error(s"$name uses no markers")

  def onCheckpoint(inst: Instance, meta: CkptMeta, now: Long): Unit = ()

  def onDurable(meta: CkptMeta, now: Long): Unit =
    rt.addProtocolBytes(metaRpcBytes(meta))

  def afterResume(now: Long): Unit = {
    val interval = rt.cfg.localIntervalMicros
    val rnd = new scala.util.Random(rt.cfg.seed ^ now)
    rt.graph.instances.foreach { id =>
      val phase = 1L + math.abs(rnd.nextLong()) % interval
      val t = now + phase
      if (t <= rt.endMicros) rt.scheduleTimer(t, "unc.local", Some(id), 0L)
    }
  }

  def plan(failTime: Long): RecoveryPlan = Recovery.planLogged(rt, failTime)
}
