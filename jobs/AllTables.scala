package jobs

import repro.core.Tables

/** Prints every table of the paper's evaluation (I–IV) in one JVM so the
  * NexMark sweep is executed once and shared between Tables II and III.
  *
  * Usage: runMain jobs.AllTables [nexmarkWorkers] [cyclicWorkers]
  *        (defaults: 10,50 and 5,10 — the paper's parallelisms)
  */
object AllTables {
  def main(args: Array[String]): Unit = {
    val nx = args.lift(0).map(_.split(",").map(_.trim.toInt).toSeq).getOrElse(Seq(10, 50))
    val cy = args.lift(1).map(_.split(",").map(_.trim.toInt).toSeq).getOrElse(Seq(5, 10))
    println(Tables.renderTable1())
    println(Tables.renderTable2(nx))
    println(Tables.renderTable3(nx))
    println(Tables.renderTable4(cy))
  }
}
