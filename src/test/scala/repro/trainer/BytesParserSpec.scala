package repro.trainer

import org.scalatest.funsuite.AnyFunSuite
import repro.datagen.{ClocLite, CriteoLite}

class BytesParserSpec extends AnyFunSuite {

  test("criteo parser: dim = 13 numerics + hashDim buckets") {
    assert(new CriteoBytesParser(128).dim == 141)
    assert(new CriteoBytesParser(32).dim == 45)
  }

  test("criteo parser: numerics are log-scaled, non-negative") {
    val p = new CriteoBytesParser(64)
    val x = p.parse(CriteoLite.record(5L, 42L))
    assert(x.length == 77)
    (0 until 13).foreach(i => assert(x(i) >= 0f))
  }

  test("criteo parser: categorical mass equals the field count") {
    val p = new CriteoBytesParser(64)
    val x = p.parse(CriteoLite.record(9L, 42L))
    val catMass = x.drop(13).sum
    assert(catMass == CriteoLite.NumCategorical.toFloat) // 26 one-hot increments
  }

  test("criteo parser: deterministic and rejects wrong record size") {
    val p = new CriteoBytesParser(64)
    val r = CriteoLite.record(2L, 1L)
    assert(p.parse(r).toSeq == p.parse(r).toSeq)
    intercept[IllegalArgumentException] { p.parse(new Array[Byte](100)) }
  }

  test("cloc parser: roundtrips the payload floats") {
    val p  = new ClocBytesParser(16)
    val pl = ClocLite.payload(2, 2008, 3, 16, 7L)
    assert(p.parse(pl).toSeq == ClocLite.parse(pl).toSeq)
    intercept[IllegalArgumentException] { p.parse(new Array[Byte](15)) }
  }

  test("identity transform returns its input") {
    val x = Array(1f, 2f)
    assert(IdentityTransform(x) eq x)
  }

  test("normalize transform shifts and scales") {
    val t = new NormalizeTransform(mean = 2f, std = 2f)
    assert(t(Array(2f, 4f, 0f)).toSeq == Seq(0f, 1f, -1f))
    intercept[IllegalArgumentException] { new NormalizeTransform(0f, 0f) }
  }

  test("simulated augment keeps values close and is deterministic") {
    val t = new SimulatedAugmentTransform(costIterations = 1000, jitter = 0.01f)
    val x = Array(1f, -2f, 3f, 0.5f)
    val a = t(x); val b = t(x)
    assert(a.toSeq == b.toSeq)
    a.zip(x).foreach { case (ai, xi) => assert(math.abs(ai - xi) <= 0.0101f) }
  }

  test("simulated augment cost scales with iterations") {
    val x = Array.fill(64)(1f)
    def time(iters: Int): Long = {
      val t = new SimulatedAugmentTransform(iters)
      (0 until 50).foreach(_ => t(x)) // warmup
      val s = System.nanoTime()
      (0 until 200).foreach(_ => t(x))
      System.nanoTime() - s
    }
    val slow = time(200000)
    val fast = time(100)
    assert(slow > fast * 3, s"slow=$slow fast=$fast")
  }

  test("model factory resolves parsers") {
    assert(ModelFactory.bytesParser("criteo", Map("hash_dim" -> 32.0)).dim == 45)
    assert(ModelFactory.bytesParser("cloc", Map("feature_dim" -> 8.0)).dim == 8)
    intercept[IllegalArgumentException] { ModelFactory.bytesParser("nope", Map.empty) }
  }
}
