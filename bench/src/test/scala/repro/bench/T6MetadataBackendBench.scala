package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.withTmpDir

/** Table T6 (§4.1.2): metadata backend insertion throughput. The paper
  * observes ~100 k insertions/s for the (optimized) Postgres backend and
  * built the C++ local binary backend because it is far faster; the same
  * asymmetry must hold between the embedded SQL backend and the binary
  * backend here.
  */
class T6MetadataBackendBench extends AnyFunSuite {

  test("T6: binary local backend ingests much faster than the SQL backend") {
    withTmpDir { dir =>
      val (table, res) = Tables.t6(dir)
      println(table)
      assert(res("local") > res("database") * 2,
        f"local ${res("local")}%.0f/s should be well above database ${res("database")}%.0f/s")
      // Sanity: the SQL backend is not absurdly slow either.
      assert(res("database") > 10000, f"database rate ${res("database")}%.0f/s")
    }
  }
}
