package jobs

import repro.core.Tables

/** Reproduces Table III: total checkpoints and percentage of invalid
  * checkpoints, per protocol, NexMark query and parallelism (failure at
  * t=18 s of the 60 s run, as in the paper).
  *
  * Usage: runMain jobs.TableIII [workers,workers,...]   (default 10,50)
  */
object TableIII {
  def main(args: Array[String]): Unit = {
    val workers = args.headOption.map(_.split(",").map(_.trim.toInt).toSeq)
      .getOrElse(Seq(10, 50))
    println(Tables.renderTable3(workers))
  }
}
