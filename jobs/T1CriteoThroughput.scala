package repro.jobs

import repro.bench.Tables

/** Regenerates Table T1 (paper Fig. 7): the Criteo-lite ingestion/training
  * throughput grid. Usage: `spark-submit --class repro.jobs.T1CriteoThroughput
  * <jar> [numSamples]`.
  */
object T1CriteoThroughput {
  def main(args: Array[String]): Unit = {
    val numSamples = args.headOption.map(_.toInt).getOrElse(300000)
    val dir = java.nio.file.Files.createTempDirectory("t1").toString
    val (table, _) = Tables.t1(dir, Tables.T1Config(numSamples = numSamples))
    println(table)
  }
}
