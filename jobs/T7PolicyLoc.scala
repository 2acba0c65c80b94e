package repro.jobs

import repro.bench.Tables

/** Regenerates Table T7 (§5.2): lines of code of the three pipelines'
  * policy implementations in this repository.
  */
object T7PolicyLoc {
  def main(args: Array[String]): Unit = {
    val (table, _) = Tables.t7(args.headOption.getOrElse("."))
    println(table)
  }
}
