package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.SimTestKit
import repro.queries._

/** Broad invariant sweep: for every query x protocol x failure instant,
  * a recovered run must drain its input with a clean exactly-once ledger
  * (no lost, duplicated or out-of-order application of any sequence) and
  * recovery bookkeeping must be internally consistent.
  */
class LedgerSweepSpec extends AnyFunSuite {

  private val queries: Seq[(String, QueryDef)] = Seq(
    "Q1" -> Q1, "Q3" -> Q3,
    "Q8" -> Q8(slackMicros = 3_600_000_000L),
    "Q12" -> Q12(slackMicros = 3_600_000_000L))
  private val failTimes = Seq(2_000_000L, 6_000_000L, 10_000_000L)

  for ((qn, q) <- queries; p <- Seq("COOR", "UNC", "CIC"); f <- failTimes)
    test(s"$qn/$p fail@${f / 1000000}s: ledger clean, input drained, bookkeeping sane") {
      val (rt, res) = SimTestKit.run(q, p, 3, rate = 150.0,
        horizonMicros = 13_000_000L, failAt = Some(f))
      assert(res.eoViolations == 0)
      assert(res.unconsumed == 0)
      assert(res.restartMicros > 0)
      if (p == "COOR") {
        assert(res.replayedMessages == 0)
        assert(res.invalidCounted == 0)
      } else {
        // Replay bytes accounting must match the replayed message count.
        assert((res.replayedMessages == 0) == (rt.metrics.replayedBytes == 0))
      }
      // Dedup only ever drops messages after a failure.
      assert(res.dedupDropped == 0 || rt.metrics.failureAt.isDefined)
    }
}
