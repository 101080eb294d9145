package repro.checkpoint

import repro.dataflow._

/** Restart-time model and shared recovery-plan construction for the logged
  * (UNC/CIC) protocols.
  *
  * Restart time (paper §V) covers state reload plus, for logged protocols,
  * running the recovery-line algorithm (insignificant — paper §VII-B) and
  * fetching/preparing the messages to replay (the dominant cost that makes
  * UNC/CIC restarts up to 10x slower than COOR at high parallelism).
  */
object Recovery {

  /** Per-channel fetch handshake with the log store. */
  private val ReplayFetchBaseMicros = 500L
  /** Per-message preparation (deserialize, re-enqueue). */
  private val ReplayPrepPerMsgMicros = 3L
  /** Modelled cost per checkpoint-graph node of the recovery-line search. */
  private val LineAlgoPerNodeMicros = 1L

  /** Workers reload their instances' states sequentially; workers are
    * parallel, so restart is the max across workers.
    */
  def stateLoadMicros(rt: ProtocolRuntime, line: Map[InstanceId, CkptMeta]): Long = {
    val perWorker = line.groupBy(_._1.idx).map { case (_, metas) =>
      metas.valuesIterator.map(m => rt.cfg.uploadMicros(m.stateBytes)).sum
    }
    if (perWorker.isEmpty) 0L else perWorker.max
  }

  /** Replay-fetch/prep cost, max across (receiving) workers. */
  def replayPrepMicros(rt: ProtocolRuntime, replay: Map[ChannelId, IndexedSeq[Msg]]): Long = {
    val perWorker = replay.groupBy(_._1.to.idx).map { case (_, chans) =>
      chans.iterator.map { case (_, msgs) =>
        val bytes = msgs.iterator.map(_.wireBytes.toLong).sum
        ReplayFetchBaseMicros + math.round(bytes / 1024.0 * rt.cfg.storeMicrosPerKb) +
          ReplayPrepPerMsgMicros * msgs.size
      }.sum
    }
    if (perWorker.isEmpty) 0L else perWorker.max
  }

  /** Full UNC/CIC recovery plan: build the checkpoint graph from durable
    * checkpoints, run rollback propagation, extract per-channel replay
    * ranges (receiver.lastReceived, sender.lastSent] from the message log,
    * and price the restart.
    */
  def planLogged(rt: ProtocolRuntime, failTime: Long): RecoveryPlan = {
    val ckpts = rt.graph.instances.map(id => id -> rt.store.durable(id, failTime)).toMap
    val g = new CheckpointGraph(ckpts)
    val (line, rolledPast) = RollbackPropagation.recoveryLine(g)

    // Invalid checkpoints: counted checkpoints the algorithm rolled past —
    // they cannot be part of this (or any fresher) consistent recovery line.
    val invalid = rolledPast.iterator.map { case (id, n) =>
      if (n == 0) 0 else ckpts(id).takeRight(n).count(_.counted)
    }.sum

    // In-flight channel state of the line, from the sender-side logs.
    val replay: Map[ChannelId, IndexedSeq[Msg]] = (for {
      (id, meta) <- line.iterator
      (ch, sent) <- meta.lastSent.iterator
      recvMeta = line(ch.to)
      lo = recvMeta.lastReceived.getOrElse(ch, 0L)
      if lo < sent
    } yield ch -> rt.log.range(ch, lo, sent)).toMap

    val nNodes = ckpts.valuesIterator.map(_.size).sum
    val lineAlgo = LineAlgoPerNodeMicros * nNodes
    val restart = stateLoadMicros(rt, line) + lineAlgo + replayPrepMicros(rt, replay)
    RecoveryPlan(line, replay, restart, invalid, lineAlgo)
  }
}
