package repro.jobs

import repro.bench.Tables

/** Regenerates Table T2 (paper Fig. 8a): best Modyn configuration vs the
  * local sequential baseline on Criteo-lite.
  */
object T2CriteoVsLocal {
  def main(args: Array[String]): Unit = {
    val numSamples = args.headOption.map(_.toInt).getOrElse(300000)
    val dir = java.nio.file.Files.createTempDirectory("t2").toString
    val (table, _) = Tables.t2(dir, numSamples = numSamples)
    println(table)
  }
}
