package jobs

import repro.core.Tables

/** Reproduces Table IV: average checkpointing time, restart time and
  * invalid-checkpoint percentage of UNC and CIC on the cyclic reachability
  * query (failure at t=48 s of the 60 s run, as in the paper).
  *
  * Usage: runMain jobs.TableIV [workers,workers,...]   (default 5,10)
  */
object TableIV {
  def main(args: Array[String]): Unit = {
    val workers = args.headOption.map(_.split(",").map(_.trim.toInt).toSeq)
      .getOrElse(Seq(5, 10))
    println(Tables.renderTable4(workers))
  }
}
