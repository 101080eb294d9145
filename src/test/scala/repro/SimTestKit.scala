package repro

import repro.core.{ExpConfig, Experiment, ExpResult}
import repro.dataflow.{Runtime, SimConfig}
import repro.queries.QueryDef

/** Shared helpers for simulator tests: small, fast runs with and without
  * failure, plus the exactly-once comparison harness.
  */
object SimTestKit {

  /** A small test schedule: events over [0, horizon], run long enough to
    * fully drain even after a failure + recovery.
    */
  def testSim(failAt: Option[Long], warmup: Long = 1_000_000L): SimConfig = SimConfig(
    warmupMicros = warmup,
    runMicros = 120_000_000L,
    failAtMicros = failAt,
    coorIntervalMicros = 2_000_000L,
    localIntervalMicros = 1_500_000L,
  )

  /** Run `query` under `protocol` with events over [0, horizonMicros];
    * the run window is generous so everything drains.
    */
  def run(query: QueryDef, protocol: String, parallelism: Int, rate: Double,
      horizonMicros: Long = 20_000_000L, failAt: Option[Long] = None,
      hotRatio: Double = 0.0, seed: Long = 7L): (Runtime, ExpResult) =
    Experiment.run(ExpConfig(query, protocol, parallelism, rate, hotRatio,
      sim = testSim(failAt.map(_ - 1_000_000L)), // failAt here is absolute; sim adds warmup
      inputHorizonMicros = Some(horizonMicros), seed = seed))

  /** Steady-state run: input spans the whole measurement window, so byte
    * ratios and checkpoint counts reflect continuous operation (as in the
    * Tables sweep), not an idle tail.
    */
  def steadyRun(query: QueryDef, protocol: String, parallelism: Int, rate: Double,
      durMicros: Long = 20_000_000L, hotRatio: Double = 0.0,
      seed: Long = 7L): (Runtime, ExpResult) = {
    val sim = SimConfig(warmupMicros = 2_000_000L, runMicros = durMicros,
      failAtMicros = None, coorIntervalMicros = 2_000_000L,
      localIntervalMicros = 1_500_000L)
    Experiment.run(ExpConfig(query, protocol, parallelism, rate, hotRatio,
      sim = sim, inputHorizonMicros = Some(sim.endMicros), seed = seed))
  }

  /** Exactly-once harness: digest of a failure-free run must equal the
    * digest of a run that failed and recovered; both runs must drain their
    * input and record zero ledger violations.
    */
  def exactlyOnceCheck(query: QueryDef, protocol: String, parallelism: Int,
      rate: Double, horizonMicros: Long = 20_000_000L,
      failAtAbs: Long = 9_000_000L, seed: Long = 7L): (ExpResult, ExpResult) = {
    val (rtOk, resOk) = run(query, protocol, parallelism, rate, horizonMicros, None, seed = seed)
    val (rtF, resF) =
      run(query, protocol, parallelism, rate, horizonMicros, Some(failAtAbs), seed = seed)
    val dOk = query.sinkDigest(rtOk)
    val dF  = query.sinkDigest(rtF)
    assert(resOk.unconsumed == 0, s"failure-free run left ${resOk.unconsumed} events unconsumed")
    assert(resF.unconsumed == 0, s"recovered run left ${resF.unconsumed} events unconsumed")
    assert(resOk.eoViolations == 0, s"ledger violations in failure-free run: ${resOk.eoViolations}")
    assert(resF.eoViolations == 0, s"ledger violations in recovered run: ${resF.eoViolations}")
    if (dOk != dF) {
      val only1 = dOk.toSet.diff(dF.toSet).take(3)
      val only2 = dF.toSet.diff(dOk.toSet).take(3)
      sys.error(s"digest mismatch for ${query.name}/$protocol: " +
        s"${dOk.size} vs ${dF.size} groups; ok-only=$only1 fail-only=$only2")
    }
    (resOk, resF)
  }
}
