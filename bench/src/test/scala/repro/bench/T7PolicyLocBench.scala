package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table T7 (§5.2 "complexity of implementation"): the paper reports the
  * three pipelines' policies at 1 line of policy logic (train on all
  * data), ~20 LOC (uniform random SQL), and ~90 LOC (GradNorm downsampler
  * with general + CE-optimized variants). The ordering and rough
  * magnitudes must hold for this repo's implementations.
  */
class T7PolicyLocBench extends AnyFunSuite {

  test("T7: policy implementation complexity ordering") {
    // bench/ is the forked test cwd; the sources live one level up.
    val (table, res) = Tables.t7("..")
    println(table)
    val newData  = res("NewDataStrategy (pipeline 1)")
    val uniform  = res("UniformRandomStrategy (pipeline 2)")
    val gradnorm = res("GradNorm downsampler (pipeline 3)")
    assert(newData < uniform && uniform < gradnorm,
      s"complexity should increase: $newData, $uniform, $gradnorm")
    assert(newData <= 10, s"train-on-all should be a handful of lines, got $newData")
    assert(gradnorm >= 40, s"the downsampler machinery should be substantial, got $gradnorm")
  }
}
