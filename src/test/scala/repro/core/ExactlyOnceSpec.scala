package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.SimTestKit
import repro.queries._

/** The central correctness property (paper §II): after a failure and
  * protocol-driven recovery, the final sink digest must equal the
  * failure-free digest — every record's effect applied exactly once —
  * for every query x protocol x failure time.
  */
class ExactlyOnceSpec extends AnyFunSuite {

  private val queries: Seq[QueryDef] = Seq(Q1, Q3, Q8(slackMicros = 3_600_000_000L), Q12(slackMicros = 3_600_000_000L))
  private val protocols = Seq("COOR", "UNC", "CIC")
  private val failTimes = Seq(4_000_000L, 9_000_000L)

  for (q <- queries; p <- protocols; f <- failTimes)
    test(s"${q.name}/$p: exactly-once across failure at ${f / 1000000}s") {
      SimTestKit.exactlyOnceCheck(q, p, parallelism = 3, rate = 150.0,
        horizonMicros = 15_000_000L, failAtAbs = f)
    }

  for (q <- Seq(Q3, Q12(slackMicros = 3_600_000_000L)); p <- protocols)
    test(s"${q.name}/$p: exactly-once at higher parallelism (5 workers)") {
      SimTestKit.exactlyOnceCheck(q, p, parallelism = 5, rate = 250.0,
        horizonMicros = 12_000_000L, failAtAbs = 6_000_000L)
    }

  for (p <- protocols; seed <- Seq(13L, 29L, 71L))
    test(s"Q3/$p: exactly-once under different input seeds (seed=$seed)") {
      SimTestKit.exactlyOnceCheck(Q3, p, parallelism = 3, rate = 150.0,
        horizonMicros = 10_000_000L, failAtAbs = 5_000_000L, seed = seed)
    }

  for (p <- Seq("UNC", "CIC"))
    test(s"Q3/$p: exactly-once under skewed input (30% hot items)") {
      val (rtOk, _) = SimTestKit.run(Q3, p, 3, 120.0, 10_000_000L, None, hotRatio = 0.3)
      val (rtF, resF) = SimTestKit.run(Q3, p, 3, 120.0, 10_000_000L,
        Some(5_000_000L), hotRatio = 0.3)
      assert(resF.eoViolations == 0)
      assert(resF.unconsumed == 0)
      assert(Q3.sinkDigest(rtOk) == Q3.sinkDigest(rtF))
    }
}
