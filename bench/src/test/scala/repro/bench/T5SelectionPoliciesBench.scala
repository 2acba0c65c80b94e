package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.withTmpDir

/** Table T5 (paper Fig. 10): the three §5.2 selection pipelines — train on
  * all data, uniform random 50 %, DLIS GradNorm 50 % — each trained
  * through 2014, evaluated on every year. Paper shape: the full model is
  * best; the random 50 % model beats the GradNorm 50 % model on every
  * evaluation year ("surprisingly hard-to-beat baseline").
  */
class T5SelectionPoliciesBench extends AnyFunSuite {

  test("T5: full vs uniform-50% vs GradNorm-50%") {
    withTmpDir { dir =>
      val registry = AccuracyExperiment.generateCorpus(dir, samplesPerYear = 1200,
        numClasses = 48, featureDim = 64)
      val reports = AccuracyExperiment.Strategies.map { kind =>
        kind -> AccuracyExperiment.run(kind, registry, s"$dir/work", 48, 64)
      }.toMap

      println("== T5 (Fig. 10): final (2014) model accuracy (%) per selection policy ==")
      println("            |  2004   2005   2006   2007   2008   2009   2010   2011   2012   2013   2014")
      AccuracyExperiment.Strategies.foreach { kind =>
        println(f"$kind%-11s |" + AccuracyExperiment.row(reports(kind), 10).dropWhile(_ != '|').drop(1))
      }

      def mean(kind: String): Double = {
        val acc = reports(kind).accuracyMatrix
        (2004 to 2014).map(y => acc((10, y.toString))).sum / 11
      }
      val (full, uniform, gradnorm) = (mean("full"), mean("uniform50"), mean("gradnorm50"))
      println(f"\nmean accuracy: full=$full%.4f uniform50=$uniform%.4f gradnorm50=$gradnorm%.4f")

      // All three learn something.
      assert(Seq(full, uniform, gradnorm).forall(_ > 1.5 / 48))
      // Paper shape: full data is the best of the three on average, and
      // random sampling is not beaten by GradNorm (allow a small epsilon).
      assert(full >= uniform * 0.9, f"full $full%.4f vs uniform $uniform%.4f")
      assert(uniform >= gradnorm * 0.9,
        f"uniform $uniform%.4f should not lose clearly to gradnorm $gradnorm%.4f")
      registry.close()
    }
  }
}
