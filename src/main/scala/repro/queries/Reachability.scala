package repro.queries

import repro.dataflow._
import repro.nexmark.NexmarkConfig
import scala.collection.mutable
import scala.util.Random

/** Events and records of the cyclic reachability query (paper §VI, Fig. 6 —
  * adapted from FFP's on-the-fly progress detection query).
  */
object Reach {
  sealed trait Ev extends Sized { def ts: Long }
  final case class AddLink(u: Long, v: Long, ts: Long)            extends Ev { def sizeBytes = 24 }
  final case class AddSource(id: Long, node: Long, ts: Long)      extends Ev { def sizeBytes = 24 }
  final case class DelLink(u: Long, v: Long, ts: Long)            extends Ev { def sizeBytes = 24 }
  final case class DelSource(id: Long, ts: Long)                  extends Ev { def sizeBytes = 16 }

  /** A reachability fact: source `id` reaches `node` along `path`. */
  final case class SourceFact(id: Long, node: Long, path: Vector[Long]) extends Sized {
    def sizeBytes: Int = 16 + 8 * path.length
  }
  /** A joined (fact, link) candidate extension. */
  final case class Pair(fact: SourceFact, u: Long, v: Long) extends Sized {
    def sizeBytes: Int = fact.sizeBytes + 16
  }

  def isDeletion(v: Any): Boolean = v match {
    case _: DelLink | _: DelSource => true
    case _                         => false
  }
}

/** The stateful join of the reachability query: links keyed by start node,
  * facts keyed by their frontier node; deletions arrive broadcast and
  * retract the link/origin plus every derived fact that used it.
  */
final class ReachJoinLogic extends OperatorLogic {
  import Reach._
  private var links = mutable.Map.empty[Long, Set[Long]]
  private var facts = mutable.Map.empty[Long, Set[SourceFact]]

  private def addFact(f: SourceFact, emit: Any => Unit): Unit = {
    val existing = facts.getOrElse(f.node, Set.empty)
    if (!existing(f)) {
      facts(f.node) = existing + f
      links.getOrElse(f.node, Set.empty).foreach(v => emit(Pair(f, f.node, v)))
    }
  }

  def onRecord(value: Any, fromOp: String, emit: Any => Unit): Unit = value match {
    case AddLink(u, v, _) =>
      val cur = links.getOrElse(u, Set.empty)
      if (!cur(v)) {
        links(u) = cur + v
        facts.getOrElse(u, Set.empty).foreach(f => emit(Pair(f, u, v)))
      }
    case AddSource(id, node, _) => addFact(SourceFact(id, node, Vector(node)), emit)
    case f: SourceFact          => addFact(f, emit)
    case DelLink(u, v, _) =>
      links.updateWith(u)(_.map(_ - v).filter(_.nonEmpty))
      // Retract every derived fact whose path traverses (u, v).
      facts = facts.map { case (n, fs) =>
        n -> fs.filterNot(f => f.path.iterator.sliding(2).withPartial(false)
          .exists(p => p.head == u && p(1) == v))
      }.filter(_._2.nonEmpty)
    case DelSource(id, _) =>
      facts = facts.map { case (n, fs) => n -> fs.filterNot(_.id == id) }.filter(_._2.nonEmpty)
    case other => sys.error(s"reach join got $other")
  }

  def snapshot(): Any = (links.toMap, facts.toMap)
  def restore(s: Any): Unit = {
    val (ls, fs) = s.asInstanceOf[(Map[Long, Set[Long]], Map[Long, Set[SourceFact]])]
    links = mutable.Map.from(ls); facts = mutable.Map.from(fs)
  }
  def stateBytes: Long =
    links.valuesIterator.map(_.size.toLong * 16L).sum +
      facts.valuesIterator.flatMap(_.iterator).map(_.sizeBytes.toLong + 16L).sum

  /** All live facts (tests compare against the fixpoint reference). */
  def allFacts: Set[Reach.SourceFact] = facts.valuesIterator.flatten.toSet
}

/** Generator configuration for the cyclic query (paper §VII: 60 % add
  * link, 15 % add source, 20 % delete link, 5 % delete source over a
  * static node set).
  */
final case class ReachConfig(
    nNodes: Long,
    ratePerSec: Double,
    durationMicros: Long,
    pAddLink: Double = 0.60,
    pAddSource: Double = 0.15,
    pDelLink: Double = 0.20,
    pDelSource: Double = 0.05,
    seed: Long = 11L,
    /** Hard bound on path length (FFP-style progress bound); keeps the
      * recursive amplification finite on dense temporal graphs.
      */
    maxPathLen: Int = 24,
)

/** The cyclic reachability query: src -> join -> select -> project with a
  * feedback edge project -> join. COOR cannot run it (marker deadlock);
  * the Runtime asserts this via `Graph.isCyclic`.
  */
final case class Reachability(cfg0: ReachConfig) extends QueryDef {
  import Reach._
  val name = "REACH"
  def includes: Set[String] = Set("reach")

  def graph(parallelism: Int): Graph = Graph(
    ops = Seq(
      OperatorSpec("src",     () => new PassThrough,   stateful = false, isSource = true,
        serviceMicros = 1500L),
      OperatorSpec("join",    () => new ReachJoinLogic, stateful = true, serviceMicros = 3000L),
      OperatorSpec("select",  () => new FilterMap({
        case p: Pair if !p.fact.path.contains(p.v) && p.fact.path.length < cfg0.maxPathLen =>
          Some(p)
        case _ => None
      }), stateful = false, serviceMicros = 800L),
      OperatorSpec("project", () => new FilterMap({
        case Pair(f, _, v) => Some(SourceFact(f.id, v, f.path :+ v))
        case _             => None
      }), stateful = false, serviceMicros = 800L),
      OperatorSpec("sink",    () => new MultisetSink,  stateful = false, isSink = true,
        serviceMicros = 300L),
    ),
    edges = Seq(
      Edge("src", "join", HashPart,
        select = v => !isDeletion(v),
        key = { case AddLink(u, _, _) => u; case AddSource(_, n, _) => n; case _ => 0L }),
      Edge("src", "join", BroadcastPart, select = isDeletion),
      Edge("join", "select", ForwardPart),
      Edge("select", "project", ForwardPart),
      Edge("project", "join", HashPart, key = { case f: SourceFact => f.node; case _ => 0L }),
      Edge("project", "sink", ForwardPart),
    ),
    parallelism = parallelism,
  )

  /** Deterministic event stream; deletions always reference live entities. */
  def events(cfg: ReachConfig = cfg0): IndexedSeq[Ev] = {
    val rnd = new Random(cfg.seed)
    val total = math.max(1L, (cfg.ratePerSec * cfg.durationMicros / 1e6).toLong)
    val step = cfg.durationMicros.toDouble / total
    val liveLinks = mutable.ArrayBuffer.empty[(Long, Long)]
    val liveSources = mutable.ArrayBuffer.empty[Long]
    var nextId = 1L
    val out = IndexedSeq.newBuilder[Ev]
    var i = 0L
    while (i < total) {
      val ts = math.round(i * step)
      val r = rnd.nextDouble()
      if (r < cfg.pAddLink || (liveLinks.isEmpty && liveSources.isEmpty)) {
        val u = 1L + rnd.nextLong(cfg.nNodes); val v = 1L + rnd.nextLong(cfg.nNodes)
        liveLinks += ((u, v)); out += AddLink(u, v, ts)
      } else if (r < cfg.pAddLink + cfg.pAddSource) {
        val id = nextId; nextId += 1
        liveSources += id
        out += AddSource(id, 1L + rnd.nextLong(cfg.nNodes), ts)
      } else if (r < cfg.pAddLink + cfg.pAddSource + cfg.pDelLink && liveLinks.nonEmpty) {
        val k = rnd.nextInt(liveLinks.length)
        val (u, v) = liveLinks.remove(k)
        out += DelLink(u, v, ts)
      } else if (liveSources.nonEmpty) {
        val k = rnd.nextInt(liveSources.length)
        out += DelSource(liveSources.remove(k), ts)
      } else {
        val u = 1L + rnd.nextLong(cfg.nNodes); val v = 1L + rnd.nextLong(cfg.nNodes)
        liveLinks += ((u, v)); out += AddLink(u, v, ts)
      }
      i += 1
    }
    out.result()
  }

  def input(parallelism: Int, nxCfg: NexmarkConfig): SourceInput =
    SourceInput.partitioned("src", parallelism,
      events(cfg0.copy(ratePerSec = nxCfg.ratePerSec, durationMicros = nxCfg.durationMicros))
        .map(e => SourceEvent(e.ts, e, e.sizeBytes)))

  def sinkDigest(rt: Runtime): Map[Any, Long] = QueryDef.mergeMultisets(rt, "sink")

  /** Live join facts merged across instances (state-level answer). */
  def joinFacts(rt: Runtime): Set[SourceFact] =
    rt.allInstances.filter(_.id.op == "join")
      .flatMap(_.logic.asInstanceOf[ReachJoinLogic].allFacts).toSet
}

object Reachability {
  import Reach._

  /** Delete-free reference: every simple path from a live origin over the
    * final link set (depth-capped for tests). Returns the SourceFact set
    * the join should converge to.
    */
  def fixpoint(links: Set[(Long, Long)], origins: Map[Long, Long],
      maxDepth: Int = 24): Set[SourceFact] = {
    val adj = links.groupBy(_._1).view.mapValues(_.map(_._2)).toMap
    val out = mutable.Set.empty[SourceFact]
    def dfs(id: Long, node: Long, path: Vector[Long]): Unit = {
      out += SourceFact(id, node, path)
      if (path.length < maxDepth)
        adj.getOrElse(node, Set.empty).foreach { v =>
          if (!path.contains(v)) dfs(id, v, path :+ v)
        }
    }
    origins.foreach { case (id, n) => dfs(id, n, Vector(n)) }
    out.toSet
  }
}
