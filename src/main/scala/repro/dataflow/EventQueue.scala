package repro.dataflow

import scala.collection.mutable

/** Actions processed by the discrete-event engine. */
sealed trait SimAction
/** A message arrives at the receiving end of `msg.channel`. */
final case class Deliver(msg: Msg)                         extends SimAction
/** Re-examine an instance's inboxes / source input for runnable work. */
final case class Wake(id: InstanceId)                      extends SimAction
/** A protocol timer/control event fires (UNC/CIC local checkpoint timers,
  * COOR round starts and per-source triggers). `inst` is the target
  * instance for per-instance events, None for coordinator-level ones.
  */
final case class ProtocolTimer(tag: String, inst: Option[InstanceId], payload: Long)
    extends SimAction
/** A checkpoint upload reaches durable storage. */
final case class UploadDone(id: InstanceId, ckptIdx: Int)  extends SimAction
/** Inject the configured global failure. */
case object InjectFailure                                  extends SimAction
/** Recovery finished; restore state and resume processing. */
case object Resume                                         extends SimAction

/** Deterministic virtual-time event queue: events pop in (time, insertion
  * order) — ties never depend on hash order, so runs are bit-reproducible.
  */
final class EventQueue {
  private final case class Entry(time: Long, tick: Long, action: SimAction)
  private implicit val ord: Ordering[Entry] =
    Ordering.by[Entry, (Long, Long)](e => (-e.time, -e.tick))
  private val pq = mutable.PriorityQueue.empty[Entry]
  private var ticks = 0L

  def schedule(time: Long, action: SimAction): Unit = {
    ticks += 1
    pq.enqueue(Entry(time, ticks, action))
  }

  def nonEmpty: Boolean = pq.nonEmpty
  def isEmpty: Boolean  = pq.isEmpty
  def peekTime: Long    = pq.head.time

  def pop(): (Long, SimAction) = {
    val e = pq.dequeue()
    (e.time, e.action)
  }

  /** Drop every pending event (used at failure: in-flight messages are lost). */
  def clear(): Unit = pq.clear()

  def size: Int = pq.size
}
