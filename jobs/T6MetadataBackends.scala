package repro.jobs

import repro.bench.Tables

/** Regenerates Table T6 (§4.1.2): selector metadata backend insertion
  * throughput (SQL backend vs binary local backend).
  */
object T6MetadataBackends {
  def main(args: Array[String]): Unit = {
    val numSamples = args.headOption.map(_.toInt).getOrElse(400000)
    val dir = java.nio.file.Files.createTempDirectory("t6").toString
    val (table, _) = Tables.t6(dir, numSamples = numSamples)
    println(table)
  }
}
