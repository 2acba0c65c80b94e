package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.withTmpDir

/** Table T3 (paper Fig. 8b): CLOC-lite throughput. The workload is
  * compute-bound (expensive per-sample augmentation + the model update on
  * the consumer thread), so throughput stagnates once ~4 workers feed the
  * trainer, and Modyn reaches 98–100 % of local for all configurations.
  */
class T3ClocThroughputBench extends AnyFunSuite {

  test("T3: compute-bound stagnation and parity with local") {
    withTmpDir { dir =>
      val (table, res) = Tables.t3(dir)
      println(table)

      val m = res.view.mapValues(_._1).toMap
      // Scaling region: 2 workers clearly beat 1.
      assert(m(2) > m(1) * 1.3, s"2 workers should scale: ${m(1)} -> ${m(2)}")
      // Stagnation region: 16 workers gain little over 4 (paper: flat).
      assert(m(16) < m(4) * 1.6, s"throughput should stagnate: ${m(4)} -> ${m(16)}")
      // Parity with local at saturation (paper: 98-100 %).
      res.filterKeys(_ >= 4).foreach { case (w, (modyn, local)) =>
        val frac = modyn / local
        assert(frac > 0.6, f"workers=$w: modyn/local = $frac%.2f")
      }
    }
  }
}
