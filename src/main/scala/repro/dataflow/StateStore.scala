package repro.dataflow

import repro.checkpoint.CkptMeta
import scala.collection.mutable

/** Durable checkpoint store (the Minio substitute).
  *
  * Uploads are asynchronous in the simulation: [[put]] registers the
  * checkpoint immediately but recovery filters on `durableAt`, so a
  * checkpoint whose upload had not finished by the failure instant simply
  * does not exist for recovery — the same semantics as an object store that
  * acks a PUT only on completion.
  *
  * Checkpoints of one instance are appended in strictly increasing `idx`
  * order (the runtime's per-instance counter), which keeps every lookup
  * positional — no re-sorting on the hot path.
  */
final class StateStore {
  private val byInstance = mutable.Map.empty[InstanceId, mutable.ArrayBuffer[CkptMeta]]

  def put(meta: CkptMeta): Unit = {
    val buf = byInstance.getOrElseUpdate(meta.id, mutable.ArrayBuffer.empty)
    require(buf.isEmpty || buf.last.idx < meta.idx,
      s"checkpoints of ${meta.id} must arrive in idx order")
    buf += meta
  }

  /** All checkpoints of `id` durable at or before `asOf`, oldest first. */
  def durable(id: InstanceId, asOf: Long): IndexedSeq[CkptMeta] =
    byInstance.get(id).map(_.filter(_.durableAt <= asOf).toIndexedSeq)
      .getOrElse(IndexedSeq.empty)

  /** Checkpoint `idx` of instance `id`, if present (positional lookup). */
  def byIdx(id: InstanceId, idx: Int): Option[CkptMeta] =
    byInstance.get(id).flatMap(_.lift(idx))

  /** Every checkpoint ever written for `id` (oldest first). */
  def all(id: InstanceId): IndexedSeq[CkptMeta] =
    byInstance.get(id).map(_.toIndexedSeq).getOrElse(IndexedSeq.empty)

  def allMetas: IndexedSeq[CkptMeta] =
    byInstance.valuesIterator.flatten.toIndexedSeq
}
