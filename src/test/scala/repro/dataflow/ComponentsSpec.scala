package repro.dataflow

import org.scalatest.funsuite.AnyFunSuite
import repro.checkpoint._
import repro.nexmark.NxBid

/** Unit tests of the small substrate components: message log, state store,
  * source input, cost model, sizing.
  */
class ComponentsSpec extends AnyFunSuite {
  private val a = InstanceId("a", 0)
  private val b = InstanceId("b", 0)
  private val ab = ChannelId(a, b)

  private def msg(seq: Long, bytes: Int = 10) =
    Msg(ab, seq, Data, seq, bytes, None, 0L)

  test("message log ranges are positional on contiguous seqs") {
    val log = new MessageLog
    (1L to 10L).foreach(s => log.append(msg(s)))
    assert(log.range(ab, 0, 10).map(_.seq) == (1L to 10L))
    assert(log.range(ab, 3, 7).map(_.seq) == (4L to 7L))
    assert(log.range(ab, 7, 3).isEmpty)
    assert(log.range(ab, 10, 20).isEmpty)
    assert(log.range(ChannelId(b, a), 0, 5).isEmpty)
  }

  test("message log byte and message totals") {
    val log = new MessageLog
    (1L to 5L).foreach(s => log.append(msg(s, 100)))
    assert(log.totalMessages == 5)
    assert(log.totalBytes == 5L * (Msg.FrameBytes + 100))
  }

  test("state store filters on durability horizon") {
    val store = new StateStore
    def meta(idx: Int, durableAt: Long) = CkptMeta(a, idx, LocalCkpt, durableAt - 1,
      durableAt, 0, (), Map.empty, Map.empty, 0, counted = true, syncMicros = 1)
    store.put(meta(1, 100)); store.put(meta(2, 200)); store.put(meta(3, 300))
    assert(store.durable(a, 250).map(_.idx) == Seq(1, 2))
    assert(store.durable(a, 99).isEmpty)
    assert(store.all(a).size == 3)
  }

  test("source input partitioning is round-robin and order-preserving") {
    val evs = (0 until 10).map(i => SourceEvent(i * 100L, i, 8))
    val in = SourceInput.partitioned("src", 3, evs)
    assert(in.totalEvents == 10)
    assert(in.events(InstanceId("src", 0)).map(_.value) == Seq(0, 3, 6, 9))
    assert(in.events(InstanceId("src", 1)).map(_.value) == Seq(1, 4, 7))
    assert(in.horizon == 900L)
  }

  test("source input rejects unsorted events") {
    intercept[IllegalArgumentException] {
      new SourceInput(Map(a -> IndexedSeq(SourceEvent(5, 1, 1), SourceEvent(2, 2, 1))))
    }
  }

  test("cost model: serde, upload and snapshot scale with bytes") {
    val c = SimConfig()
    assert(c.serdeMicros(0) == 0)
    assert(c.serdeMicros(2048) == math.round(2 * c.serdeMicrosPerKb))
    assert(c.uploadMicros(0) == c.storePutMicros)
    assert(c.uploadMicros(1024 * 100) > c.uploadMicros(1024))
    assert(c.snapshotMicros(1024) > c.snapshotBaseMicros)
  }

  test("sim config end/fail instants compose warmup and run") {
    val c = SimConfig(warmupMicros = 5, runMicros = 10, failAtMicros = Some(3))
    assert(c.endMicros == 15)
    assert(c.failAbs.contains(8L))
  }

  test("sizer: events carry their declared size; products are estimated") {
    assert(Sizer.bytes(NxBid(1, 2, 3.0, 4)) == 32)
    assert(Sizer.bytes(7L) == 8)
    assert(Sizer.bytes("abcd") == 8)
    assert(Sizer.bytes((1L, 2L)) == 24)
  }

  test("wire bytes = frame + payload + piggyback") {
    val p = Piggyback(1, Array(1), Array(true), Array(false), 20)
    assert(msg(1, 100).wireBytes == Msg.FrameBytes + 100)
    assert(msg(1, 100).copy(piggyback = Some(p)).wireBytes == Msg.FrameBytes + 120)
  }

  test("instance state bytes include channel metadata; uncounted ops stay near zero") {
    val spec = OperatorSpec("x", () => new repro.queries.PassThrough, stateful = false)
    val inst = new Instance(InstanceId("x", 0), spec, spec.logic(), IndexedSeq(ab), IndexedSeq())
    assert(inst.stateBytes < 64)
  }
}
