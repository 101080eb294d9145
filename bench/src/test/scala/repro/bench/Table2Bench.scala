package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Tables

/** Table II: message-overhead ratio per protocol, query and parallelism,
  * at 80 % of each cell's own MST with a failure at t=18 s (paper §VII-B).
  *
  * Asserted shape (paper): COOR and UNC are ~1.00x everywhere; CIC is far
  * above both (1.7x–2.6x in the paper) and grows with parallelism.
  */
class Table2Bench extends AnyFunSuite {
  private val workers = BenchScale.nexmarkWorkers

  test("TABLE II — message overhead ratios") {
    println(Tables.renderTable2(workers))
    for (w <- workers; q <- Tables.nexmarkQueries) {
      val coor = Tables.nexmarkCell(q, "COOR", w).overheadRatio
      val unc = Tables.nexmarkCell(q, "UNC", w).overheadRatio
      val cic = Tables.nexmarkCell(q, "CIC", w).overheadRatio
      assert(coor < 1.05, s"${q.name}@$w COOR $coor")
      assert(unc < 1.08, s"${q.name}@$w UNC $unc")
      assert(cic > 1.3, s"${q.name}@$w CIC $cic should be far above 1")
      assert(cic > unc + 0.2 && cic > coor + 0.2, s"${q.name}@$w CIC must dominate")
    }
  }

  test("TABLE II shape — CIC overhead grows with parallelism") {
    if (workers.size < 2) cancel("single parallelism configured")
    val (lo, hi) = (workers.min, workers.max)
    for (q <- Tables.nexmarkQueries) {
      val a = Tables.nexmarkCell(q, "CIC", lo).overheadRatio
      val b = Tables.nexmarkCell(q, "CIC", hi).overheadRatio
      assert(b > a, s"${q.name}: CIC ratio $a @$lo vs $b @$hi")
    }
  }

  test("exactly-once ledger is clean in every Table II cell") {
    for (w <- workers; q <- Tables.nexmarkQueries; p <- Tables.Protocols) {
      val r = Tables.nexmarkCell(q, p, w)
      assert(r.eoViolations == 0, s"${q.name}/$p@$w: ${r.eoViolations} violations")
    }
  }
}
