package repro.jobs

import repro.bench.AccuracyExperiment

/** Regenerates Table T4 (paper Fig. 9): the accuracy matrix of the
  * full-data pipeline — models trained up to 2008/2010/2012 evaluated on
  * every year 2004–2014.
  */
object T4AccuracyMatrix {
  def main(args: Array[String]): Unit = {
    val samplesPerYear = args.headOption.map(_.toInt).getOrElse(1200)
    val dir      = java.nio.file.Files.createTempDirectory("t4").toString
    val registry = AccuracyExperiment.generateCorpus(dir, samplesPerYear,
      numClasses = 48, featureDim = 64)
    val report = AccuracyExperiment.run("full", registry, s"$dir/work", 48, 64)
    println("== T4 (Fig. 9): accuracy (%) of the full-data pipeline across years ==")
    println("            |  2004   2005   2006   2007   2008   2009   2010   2011   2012   2013   2014")
    Seq(2008, 2010, 2012).foreach { y =>
      println(AccuracyExperiment.row(report, y - 2004))
    }
    registry.close()
  }
}
