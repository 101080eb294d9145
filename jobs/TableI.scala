package jobs

import repro.core.Tables

/** Prints Table I (qualitative protocol feature matrix) derived from the
  * protocol implementations. Usage: runMain jobs.TableI
  */
object TableI {
  def main(args: Array[String]): Unit =
    println(Tables.renderTable1())
}
