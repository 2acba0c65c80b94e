package repro.jobs

import repro.bench.AccuracyExperiment

/** Regenerates Table T5 (paper Fig. 10): the three §5.2 data selection
  * pipelines (train-on-all, uniform random 50 %, DLIS GradNorm 50 %)
  * trained through 2014, evaluated on every year.
  */
object T5SelectionPolicies {
  def main(args: Array[String]): Unit = {
    val samplesPerYear = args.headOption.map(_.toInt).getOrElse(1200)
    val dir      = java.nio.file.Files.createTempDirectory("t5").toString
    val registry = AccuracyExperiment.generateCorpus(dir, samplesPerYear,
      numClasses = 48, featureDim = 64)
    println("== T5 (Fig. 10): final (2014) model accuracy (%) per selection policy ==")
    println("            |  2004   2005   2006   2007   2008   2009   2010   2011   2012   2013   2014")
    AccuracyExperiment.Strategies.foreach { kind =>
      val report = AccuracyExperiment.run(kind, registry, s"$dir/work", 48, 64)
      println(f"$kind%-11s ${AccuracyExperiment.row(report, 2014 - 2004).drop("model@2014 ".length)}")
    }
    registry.close()
  }
}
