package repro.queries

import org.scalatest.funsuite.AnyFunSuite
import repro.SimTestKit
import repro.core.{ExpConfig, Experiment}
import repro.queries.Reach._

/** The cyclic reachability query: fixpoint correctness, cyclic execution
  * under UNC/CIC, and exactly-once across failures on a cyclic graph.
  */
class ReachabilitySpec extends AnyFunSuite {

  // Sparse graphs (few links per node) keep the simple-path space small,
  // as the paper's 1M-node static set does at its event rates.
  private def deleteFree(nNodes: Long, rate: Double) =
    Reachability(ReachConfig(nNodes, rate, 0L, pAddLink = 0.8, pAddSource = 0.2,
      pDelLink = 0.0, pDelSource = 0.0))

  private def fullMix(nNodes: Long) = Reachability(ReachConfig(nNodes, 0.0, 0L))

  test("fixpoint reference: trivial line graph") {
    val links = Set((1L, 2L), (2L, 3L))
    val fps = Reachability.fixpoint(links, Map(7L -> 1L))
    assert(fps == Set(
      SourceFact(7, 1, Vector(1)),
      SourceFact(7, 2, Vector(1, 2)),
      SourceFact(7, 3, Vector(1, 2, 3))))
  }

  test("fixpoint reference: cycles yield only simple paths") {
    val links = Set((1L, 2L), (2L, 1L))
    val fps = Reachability.fixpoint(links, Map(5L -> 1L))
    assert(fps == Set(SourceFact(5, 1, Vector(1)), SourceFact(5, 2, Vector(1, 2))))
  }

  test("delete-free run converges to the fixpoint (UNC)") {
    val q = deleteFree(3000, 100.0)
    val (rt, res) = SimTestKit.run(q, "UNC", 3, rate = 100.0, horizonMicros = 8_000_000L)
    assert(res.unconsumed == 0)
    assert(res.eoViolations == 0)
    val evs = q.events(q.cfg0.copy(ratePerSec = 100.0, durationMicros = 8_000_000L))
    val links = evs.collect { case AddLink(u, v, _) => (u, v) }.toSet
    val origins = evs.collect { case AddSource(id, n, _) => id -> n }.toMap
    assert(q.joinFacts(rt) == Reachability.fixpoint(links, origins))
  }

  test("delete-free run converges to the fixpoint (CIC)") {
    val q = deleteFree(3000, 100.0)
    val (rt, res) = SimTestKit.run(q, "CIC", 3, rate = 100.0, horizonMicros = 8_000_000L)
    assert(res.eoViolations == 0)
    val evs = q.events(q.cfg0.copy(ratePerSec = 100.0, durationMicros = 8_000_000L))
    val links = evs.collect { case AddLink(u, v, _) => (u, v) }.toSet
    val origins = evs.collect { case AddSource(id, n, _) => id -> n }.toMap
    assert(q.joinFacts(rt) == Reachability.fixpoint(links, origins))
  }

  for (p <- Seq("UNC", "CIC"))
    test(s"exactly-once on the cyclic graph across failure ($p, delete-free)") {
      val q = deleteFree(3000, 100.0)
      val (rtOk, resOk) = SimTestKit.run(q, p, 3, 100.0, 10_000_000L, None)
      val (rtF, resF) = SimTestKit.run(q, p, 3, 100.0, 10_000_000L, Some(5_000_000L))
      assert(resOk.eoViolations == 0 && resF.eoViolations == 0)
      assert(resF.unconsumed == 0)
      assert(q.joinFacts(rtOk) == q.joinFacts(rtF),
        "cyclic query state must survive recovery unchanged")
      assert(q.sinkDigest(rtOk) == q.sinkDigest(rtF))
    }

  for (p <- Seq("UNC", "CIC"))
    test(s"full event mix (with deletions) runs clean under $p with failure") {
      val q = fullMix(5000)
      val (rt, res) = SimTestKit.run(q, p, 3, 150.0, 12_000_000L, Some(6_000_000L))
      assert(res.eoViolations == 0)
      assert(res.unconsumed == 0)
      assert(res.totalCounted > 0)
    }

  test("deletions retract links and dependent facts") {
    val logic = new ReachJoinLogic
    val out = scala.collection.mutable.ArrayBuffer.empty[Any]
    logic.onRecord(AddSource(1, 10, 0), "", out += _)
    logic.onRecord(AddLink(10, 11, 1), "", out += _)
    // Feed the derived fact back (as project would).
    logic.onRecord(SourceFact(1, 11, Vector(10, 11)), "", out += _)
    assert(logic.allFacts.exists(_.node == 11))
    logic.onRecord(DelLink(10, 11, 2), "", out += _)
    assert(!logic.allFacts.exists(_.node == 11), "fact via deleted link must be retracted")
    logic.onRecord(DelSource(1, 3), "", out += _)
    assert(logic.allFacts.isEmpty)
  }

  test("select discards cyclic path extensions") {
    val q = fullMix(100)
    val g = q.graph(1)
    val sel = g.op("select").logic()
    val out = scala.collection.mutable.ArrayBuffer.empty[Any]
    sel.onRecord(Pair(SourceFact(1, 2, Vector(1, 2)), 2, 1), "", out += _) // 1 already in path
    assert(out.isEmpty)
    sel.onRecord(Pair(SourceFact(1, 2, Vector(1, 2)), 2, 3), "", out += _)
    assert(out.size == 1)
  }

  test("invalid checkpoints stay low on the cyclic query (no domino effect)") {
    val q = fullMix(5000)
    for (p <- Seq("UNC", "CIC")) {
      val (_, res) = SimTestKit.run(q, p, 3, 150.0, 12_000_000L, Some(8_000_000L))
      assert(res.invalidPct < 25.0, s"$p invalid ${res.invalidPct}%")
    }
  }
}
