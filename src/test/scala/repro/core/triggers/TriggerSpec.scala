package repro.core.triggers

import org.scalatest.funsuite.AnyFunSuite
import repro.selector.NewSample

class TriggerSpec extends AnyFunSuite {

  private def samples(n: Int, ts: Int => Long = _.toLong): Seq[NewSample] =
    (0 until n).map(i => NewSample(i + 1L, 0L, ts(i)))

  test("amount: fires every nth data point") {
    val t = new DataAmountTrigger(3)
    assert(t.inform(samples(7)) == Seq(2, 5))
    assert(t.inform(samples(2)) == Seq(1)) // 9th data point overall
  }

  test("amount: counter carries across batches") {
    val t = new DataAmountTrigger(5)
    assert(t.inform(samples(3)) == Seq.empty)
    assert(t.inform(samples(3)) == Seq(1)) // 5th overall
    assert(t.inform(samples(4)) == Seq(3)) // 10th overall
  }

  test("amount: multiple triggers in one batch") {
    val t = new DataAmountTrigger(2)
    assert(t.inform(samples(7)) == Seq(1, 3, 5))
  }

  test("amount: n = 1 fires on every sample") {
    val t = new DataAmountTrigger(1)
    assert(t.inform(samples(3)) == Seq(0, 1, 2))
  }

  test("amount: empty batch fires nothing") {
    val t = new DataAmountTrigger(2)
    assert(t.inform(Seq.empty) == Seq.empty)
  }

  test("amount: rejects non-positive n") {
    intercept[IllegalArgumentException] { new DataAmountTrigger(0) }
  }

  test("time: fires when a timestamp crosses the interval boundary") {
    val t = new TimePeriodTrigger(10)
    // First sample at t=0 anchors the grid: boundaries at 10, 20, ...
    assert(t.inform(samples(5, i => i.toLong * 3)) == Seq(4)) // ts 0,3,6,9,12 -> 12 crosses 10
  }

  test("time: several empty intervals collapse into one trigger") {
    val t = new TimePeriodTrigger(10)
    assert(t.inform(Seq(NewSample(1, 0, 0))) == Seq.empty)
    assert(t.inform(Seq(NewSample(2, 0, 55))) == Seq(0)) // crossed 10..50 at once
    // Grid stays anchored: next boundary is 60.
    assert(t.inform(Seq(NewSample(3, 0, 59))) == Seq.empty)
    assert(t.inform(Seq(NewSample(4, 0, 60))) == Seq(0))
  }

  test("time: one trigger per boundary with dense data") {
    val t = new TimePeriodTrigger(10)
    val idxs = t.inform(samples(40, _.toLong)) // ts 0..39
    assert(idxs == Seq(10, 20, 30))
  }

  test("time: timestamps within the first interval never fire") {
    val t = new TimePeriodTrigger(100)
    assert(t.inform(samples(50, _.toLong)) == Seq.empty)
  }

  test("time: rejects non-positive interval") {
    intercept[IllegalArgumentException] { new TimePeriodTrigger(0) }
  }

  test("time: yearly trigger over CLOC-style timestamps fires once a year") {
    import repro.datagen.ClocLite
    val t = new TimePeriodTrigger(31536000L)
    val perYear = 5
    val stream = for {
      y <- 2004 to 2007
      i <- 0 until perYear
    } yield NewSample(y * 100L + i, 0, ClocLite.yearStartSec(y) + i * 1000L)
    val idxs = t.inform(stream)
    assert(idxs == Seq(5, 10, 15)) // first sample of each later year
  }

  test("registry: byName resolves and validates") {
    assert(Trigger.byName("DataAmountTrigger", Map("data_points_for_trigger" -> 5.0))
      .isInstanceOf[DataAmountTrigger])
    assert(Trigger.byName("TimeTrigger", Map("every_seconds" -> 60.0))
      .isInstanceOf[TimePeriodTrigger])
    intercept[IllegalArgumentException] { Trigger.byName("DataAmountTrigger", Map.empty) }
    intercept[IllegalArgumentException] { Trigger.byName("TimeTrigger", Map.empty) }
    intercept[IllegalArgumentException] { Trigger.byName("MoonPhaseTrigger", Map.empty) }
  }
}
