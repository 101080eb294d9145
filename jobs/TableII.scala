package jobs

import repro.core.Tables

/** Reproduces Table II: message-overhead ratio of each protocol w.r.t. a
  * checkpoint-free execution, per NexMark query and parallelism.
  *
  * Usage: runMain jobs.TableII [workers,workers,...]   (default 10,50)
  */
object TableII {
  def main(args: Array[String]): Unit = {
    val workers = args.headOption.map(_.split(",").map(_.trim.toInt).toSeq)
      .getOrElse(Seq(10, 50))
    println(Tables.renderTable2(workers))
  }
}
