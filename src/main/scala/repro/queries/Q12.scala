package repro.queries

import repro.dataflow._
import repro.nexmark._
import scala.collection.mutable

/** Running tumbling-window bid count per bidder (NexMark Q12): emits the
  * updated count on every bid (the paper's "running window"); the sink
  * keeps the max per (bidder, window), which equals the final count
  * regardless of emission interleaving. Window state expires `slackMicros`
  * after the window closes.
  */
final class Q12CountLogic(windowMicros: Long, slackMicros: Long) extends OperatorLogic {
  private var counts = mutable.Map.empty[(Long, Long), Long]
  private var watermark = 0L

  def onRecord(value: Any, fromOp: String, emit: Any => Unit): Unit = value match {
    case b: NxBid =>
      if (b.ts > watermark) {
        watermark = b.ts
        val expired = math.max(0L, watermark - slackMicros) / windowMicros
        counts.keysIterator.filter(_._2 < expired - 1).toList.foreach(counts.remove)
      }
      val key = (b.bidder, b.ts / windowMicros)
      val c = counts.getOrElse(key, 0L) + 1L
      counts(key) = c
      emit(Q12Out(key._1, key._2, c))
    case other => sys.error(s"Q12 got $other")
  }

  def snapshot(): Any = (counts.toMap, watermark)
  def restore(s: Any): Unit = {
    val (cs, wm) = s.asInstanceOf[(Map[(Long, Long), Long], Long)]
    counts = mutable.Map.from(cs); watermark = wm
  }
  def stateBytes: Long = counts.size.toLong * 40L + 16L
}

/** NexMark Q12 (paper §VI): windowed count over bids with minor shuffling. */
final case class Q12(slackMicros: Long = 20_000_000L) extends QueryDef {
  val name = "Q12"
  def includes: Set[String] = Set("bid")

  def graph(parallelism: Int): Graph = Graph(
    ops = Seq(
      OperatorSpec("src",   () => new PassThrough, stateful = false, isSource = true,
        serviceMicros = 2000L),
      OperatorSpec("count",
        () => new Q12CountLogic(NexmarkGen.WindowMicros, slackMicros),
        stateful = true, serviceMicros = 3000L),
      OperatorSpec("sink",
        () => new UpsertMaxSink(
          { case Q12Out(b, w, _) => (b, w); case x => x },
          { case Q12Out(_, _, c) => c; case _ => 0L }),
        stateful = false, isSink = true, serviceMicros = 300L),
    ),
    edges = Seq(
      Edge("src",   "count", HashPart, key = { case b: NxBid => b.bidder; case _ => 0L }),
      Edge("count", "sink",  ForwardPart),
    ),
    parallelism = parallelism,
  )

  def input(parallelism: Int, cfg: NexmarkConfig): SourceInput =
    SourceInput.partitioned("src", parallelism,
      NexmarkGen.sourceEvents(NexmarkGen.events(cfg.copy(include = includes))))

  def sinkDigest(rt: Runtime): Map[Any, Long] = QueryDef.mergeUpserts(rt, "sink")
}
