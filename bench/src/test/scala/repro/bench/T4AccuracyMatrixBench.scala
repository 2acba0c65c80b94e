package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.withTmpDir

/** Table T4 (paper Fig. 9): the accuracy matrix of the full-data pipeline
  * on CLOC-lite — yearly triggers 2004–2014, each trained model evaluated
  * on every year. The paper's shape: accuracy peaks on the most recent
  * training year (recency under distribution shift) and later models'
  * peaks are higher (better general representations).
  */
class T4AccuracyMatrixBench extends AnyFunSuite {

  test("T4: accuracy matrix with recency peaks") {
    withTmpDir { dir =>
      val registry = AccuracyExperiment.generateCorpus(dir, samplesPerYear = 1200,
        numClasses = 48, featureDim = 64)
      val report = AccuracyExperiment.run("full", registry, s"$dir/work", 48, 64)

      println("== T4 (Fig. 9): accuracy (%) of the full-data pipeline across years ==")
      println("            |  2004   2005   2006   2007   2008   2009   2010   2011   2012   2013   2014")
      Seq(2008, 2010, 2012).foreach(y => println(AccuracyExperiment.row(report, y - 2004)))

      val acc = report.accuracyMatrix
      assert(report.triggers.size == 11, s"expected 11 yearly triggers, got ${report.triggers.size}")

      def a(modelYear: Int, evalYear: Int): Double =
        acc((modelYear - 2004, evalYear.toString))

      // Shape 1: each shown model beats 48-class random guessing (~2.1 %)
      // on its most recent training year, by a wide margin.
      Seq(2008, 2010, 2012).foreach { y =>
        assert(a(y, y) > 3 * (1.0 / 48), f"model@$y on $y: ${a(y, y)}%.3f")
      }
      // Shape 2: recency — the 2008 model is better on 2008 than on the
      // far-future 2014 distribution; same for 2010 vs 2014.
      assert(a(2008, 2008) > a(2008, 2014), "2008 model should degrade on 2014 data")
      assert(a(2010, 2010) > a(2010, 2014), "2010 model should degrade on 2014 data")
      // Shape 3: later models peak at least as high as the earliest model
      // (paper: peaks increase with later models).
      assert(a(2012, 2012) > a(2008, 2004) * 0.8)
      registry.close()
    }
  }
}
