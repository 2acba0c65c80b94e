package repro.jobs

import repro.bench.Tables

/** Regenerates Table T3 (paper Fig. 8b): CLOC-lite (compute-bound)
  * throughput vs the local baseline across worker counts.
  */
object T3ClocThroughput {
  def main(args: Array[String]): Unit = {
    val samplesPerYear = args.headOption.map(_.toInt).getOrElse(2000)
    val dir = java.nio.file.Files.createTempDirectory("t3").toString
    val (table, _) = Tables.t3(dir, samplesPerYear = samplesPerYear)
    println(table)
  }
}
