package repro.dataflow

/** How an edge routes an emitted record to the parallel instances of the
  * downstream operator.
  */
sealed trait Partitioning
/** Route by hash of the edge's key function (shuffling). */
case object HashPart      extends Partitioning
/** Route to the same subtask index (requires equal parallelism). */
case object ForwardPart   extends Partitioning
/** Route to every downstream instance (e.g. deletions in the cyclic query). */
case object BroadcastPart extends Partitioning

/** A logical edge of the dataflow graph.
  *
  * @param select  records for which this edge applies (models topic demux /
  *                fused filters — an emitted record only travels edges whose
  *                `select` accepts it)
  * @param key     extracts the routing key for [[HashPart]] edges
  */
final case class Edge(
    from: String,
    to: String,
    part: Partitioning,
    select: Any => Boolean = _ => true,
    key: Any => Long = _ => 0L,
)

/** Operator-level behaviour: state transition + snapshot/restore.
  *
  * Implementations must be deterministic functions of (state, record) and
  * keep state updates commutative across independent input channels — both
  * are required for exactly-once recovery to reproduce the failure-free
  * result (see DESIGN.md §6). A fresh logic object is created per instance
  * via [[OperatorSpec.logic]].
  */
trait OperatorLogic {
  /** Process one record; emit downstream records via `emit`. `fromOp` is
    * the upstream logical operator ("" for source input).
    */
  def onRecord(value: Any, fromOp: String, emit: Any => Unit): Unit
  /** Deep snapshot of operator state (must not alias mutable internals). */
  def snapshot(): Any
  /** Restore from a snapshot produced by [[snapshot]]. */
  def restore(s: Any): Unit
  /** Approximate serialized state size (drives checkpoint cost). */
  def stateBytes: Long
}

/** A logical operator of the dataflow graph.
  *
  * @param logic       factory for per-instance logic objects
  * @param stateful    whether the operator holds query state (stateful and
  *                    source operators are the checkpoint-counting set;
  *                    stateless ops snapshot only channel-position metadata)
  * @param isSource    sources read the replayable input instead of channels
  * @param isSink      sinks record outputs/latency; they snapshot metadata only
  * @param serviceMicros CPU time to process one record (excl. serde)
  */
final case class OperatorSpec(
    name: String,
    logic: () => OperatorLogic,
    stateful: Boolean,
    isSource: Boolean = false,
    isSink: Boolean = false,
    serviceMicros: Long = 100L,
) {
  /** Does this operator's checkpoints count toward Table III/IV totals? */
  def counted: Boolean = stateful || isSource
}

/** A streaming dataflow: logical operators + edges, all at the same
  * parallelism (one instance of every operator per worker, as in the
  * paper's testbed).
  */
final case class Graph(ops: Seq[OperatorSpec], edges: Seq[Edge], parallelism: Int) {
  require(parallelism > 0, "parallelism must be positive")
  private val byName: Map[String, OperatorSpec] = ops.map(o => o.name -> o).toMap
  require(byName.size == ops.size, "duplicate operator names")
  edges.foreach { e =>
    require(byName.contains(e.from), s"edge from unknown op ${e.from}")
    require(byName.contains(e.to), s"edge to unknown op ${e.to}")
  }

  def op(name: String): OperatorSpec = byName(name)
  def outEdges(op: String): Seq[Edge] = edges.filter(_.from == op)
  def inEdges(op: String): Seq[Edge]  = edges.filter(_.to == op)

  def instances: Seq[InstanceId] =
    for (o <- ops; i <- 0 until parallelism) yield InstanceId(o.name, i)

  /** All physical channels created by an edge. */
  def channelsOf(e: Edge): Seq[ChannelId] = e.part match {
    case ForwardPart =>
      (0 until parallelism).map(i => ChannelId(InstanceId(e.from, i), InstanceId(e.to, i)))
    case _ =>
      for (i <- 0 until parallelism; j <- 0 until parallelism)
        yield ChannelId(InstanceId(e.from, i), InstanceId(e.to, j))
  }

  /** Physical input channels of an instance (dedup'd across parallel edges). */
  def inChannels(id: InstanceId): Seq[ChannelId] =
    inEdges(id.op).flatMap(channelsOf).filter(_.to == id).distinct

  def outChannels(id: InstanceId): Seq[ChannelId] =
    outEdges(id.op).flatMap(channelsOf).filter(_.from == id).distinct

  /** Whether the logical graph contains a cycle (COOR refuses these). */
  def isCyclic: Boolean = {
    val adj = edges.groupBy(_.from).view.mapValues(_.map(_.to)).toMap
    val color = scala.collection.mutable.Map.empty[String, Int] // 0 white 1 grey 2 black
    def dfs(u: String): Boolean = {
      color(u) = 1
      val bad = adj.getOrElse(u, Nil).exists { v =>
        color.getOrElse(v, 0) match {
          case 1 => true
          case 0 => dfs(v)
          case _ => false
        }
      }
      color(u) = 2
      bad
    }
    ops.exists(o => color.getOrElse(o.name, 0) == 0 && dfs(o.name))
  }

  /** Target subtask indices for a record emitted on edge `e` from subtask `fromIdx`. */
  def route(e: Edge, fromIdx: Int, value: Any): Seq[Int] = e.part match {
    case ForwardPart   => Seq(fromIdx)
    case BroadcastPart => 0 until parallelism
    case HashPart =>
      val k = e.key(value)
      val h = scala.util.hashing.byteswap64(k)
      Seq((math.floorMod(h, parallelism.toLong)).toInt)
  }
}
