package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Tables

/** Table III: total checkpoints and percentage of invalid checkpoints per
  * protocol, query and parallelism (failure at t=18 s).
  *
  * Asserted shape (paper): COOR has zero invalid checkpoints; UNC/CIC take
  * more checkpoints than COOR and have a small invalid percentage; totals
  * scale roughly linearly with the number of workers; no domino effect.
  */
class Table3Bench extends AnyFunSuite {
  private val workers = BenchScale.nexmarkWorkers

  test("TABLE III — totals and invalid percentages") {
    println(Tables.renderTable3(workers))
    for (w <- workers; q <- Tables.nexmarkQueries) {
      val coor = Tables.nexmarkCell(q, "COOR", w)
      val unc = Tables.nexmarkCell(q, "UNC", w)
      val cic = Tables.nexmarkCell(q, "CIC", w)
      assert(coor.invalidCounted == 0, s"${q.name}@$w COOR must have 0 invalid")
      assert(coor.totalCounted > 0, s"${q.name}@$w COOR took no checkpoints")
      assert(unc.totalCounted > coor.totalCounted,
        s"${q.name}@$w UNC ${unc.totalCounted} <= COOR ${coor.totalCounted}")
      assert(cic.totalCounted > coor.totalCounted, s"${q.name}@$w CIC vs COOR")
      assert(unc.invalidPct < 15.0, s"${q.name}@$w UNC invalid ${unc.invalidPct}%")
      assert(cic.invalidPct < 15.0, s"${q.name}@$w CIC invalid ${cic.invalidPct}%")
    }
  }

  test("TABLE III shape — totals scale with parallelism") {
    if (workers.size < 2) cancel("single parallelism configured")
    val (lo, hi) = (workers.min, workers.max)
    val factor = hi.toDouble / lo
    for (q <- Tables.nexmarkQueries; p <- Tables.Protocols) {
      val a = Tables.nexmarkCell(q, p, lo).totalCounted.toDouble
      val b = Tables.nexmarkCell(q, p, hi).totalCounted.toDouble
      assert(b > a * factor * 0.6 && b < a * factor * 1.4,
        s"${q.name}/$p: totals $a @$lo vs $b @$hi not ~linear in workers")
    }
  }

  test("TABLE III shape — recovery shows no domino effect in any cell") {
    for (w <- workers; q <- Tables.nexmarkQueries; p <- Seq("UNC", "CIC")) {
      val r = Tables.nexmarkCell(q, p, w)
      // Rolling back more than one checkpoint per instance on average
      // would indicate domino-like propagation; the paper observed none.
      val instances = w * 2 // at most: source + stateful op per worker
      assert(r.invalidCounted <= instances * 2,
        s"${q.name}/$p@$w rolled back ${r.invalidCounted} checkpoints")
    }
  }

  test("restart: COOR restarts faster than the logged protocols (Fig. 11 shape)") {
    for (w <- workers; q <- Tables.nexmarkQueries) {
      val coor = Tables.nexmarkCell(q, "COOR", w)
      val unc = Tables.nexmarkCell(q, "UNC", w)
      assert(unc.restartMicros >= coor.restartMicros,
        s"${q.name}@$w UNC restart ${unc.restartMicros} < COOR ${coor.restartMicros}")
    }
  }
}
