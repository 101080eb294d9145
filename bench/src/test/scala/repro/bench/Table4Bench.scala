package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Tables

/** Table IV: the cyclic reachability query under UNC and CIC — average
  * checkpointing time (CT), restart time (RT), invalid checkpoints (IC).
  * COOR is excluded: the aligned protocol deadlocks on cycles (asserted).
  *
  * Asserted shape (paper): CT is ms-scale with CIC >= UNC (protocol
  * vectors in the snapshot); RT is sub-second; IC is a small percentage
  * for both — i.e. the domino effect does not materialize.
  */
class Table4Bench extends AnyFunSuite {
  private val workers = BenchScale.cyclicWorkers

  test("TABLE IV — cyclic query CT / RT / IC") {
    println(Tables.renderTable4(workers))
    for (w <- workers) {
      val unc = Tables.cyclicCell("UNC", w)
      val cic = Tables.cyclicCell("CIC", w)
      assert(unc.eoViolations == 0 && cic.eoViolations == 0)
      // CT: both small; CIC pays for checkpointing its vectors.
      assert(cic.avgCheckpointMicros >= unc.avgCheckpointMicros,
        s"@$w CT: CIC ${cic.avgCheckpointMicros} < UNC ${unc.avgCheckpointMicros}")
      assert(unc.avgCheckpointMicros < 100_000.0, s"@$w UNC CT not ms-scale")
      // RT: sub-second in the paper's setup; ours is a cost model — assert
      // the magnitude, not the exact value.
      assert(unc.restartMicros > 0 && unc.restartMicros < 5_000_000L)
      assert(cic.restartMicros > 0 && cic.restartMicros < 5_000_000L)
      // IC: small percentages, no domino effect (the paper sees 1.4-1.7%;
      // at tiny quick-scale parallelisms each rolled-back checkpoint weighs
      // more, hence the slack).
      assert(unc.invalidPct < 15.0, s"@$w UNC IC ${unc.invalidPct}%")
      assert(cic.invalidPct < 15.0, s"@$w CIC IC ${cic.invalidPct}%")
      // CIC actually forces checkpoints on the cyclic topology.
      assert(cic.forcedCounted > 0)
    }
  }

  test("COOR deadlocks on cycles and is excluded (paper §VII)") {
    val ex = intercept[IllegalArgumentException](Tables.cyclicCell("COOR", workers.min))
    assert(ex.getMessage.contains("cyclic"))
  }
}
