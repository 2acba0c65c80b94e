package repro.core.triggers

import repro.selector.NewSample

/** A triggering policy (§3.1, §4.1.1): informed of each arriving batch
  * S_t, it returns the ordered list of indices i whose sample s_i causes a
  * new training run. Policies are stateful and may use the entire history.
  */
trait Trigger {
  /** Indices (0-based, ascending) within `samples` that cause a trigger. */
  def inform(samples: Seq[NewSample]): Seq[Int]
}

/** Amount-based triggering: fire on every `dataPointsForTrigger`-th data
  * point. Multiple triggers can fall inside one informed batch.
  */
final class DataAmountTrigger(dataPointsForTrigger: Int) extends Trigger {
  require(dataPointsForTrigger > 0, "data_points_for_trigger must be positive")
  private var seenSinceTrigger = 0

  override def inform(samples: Seq[NewSample]): Seq[Int] = {
    val out = Seq.newBuilder[Int]
    samples.zipWithIndex.foreach { case (_, i) =>
      seenSinceTrigger += 1
      if (seenSinceTrigger == dataPointsForTrigger) {
        out += i
        seenSinceTrigger = 0
      }
    }
    out.result()
  }
}

/** Time-based triggering: fire when a sample's timestamp crosses the next
  * interval boundary since the last trigger. The boundary grid is anchored
  * at the first sample ever seen; several empty intervals collapse into a
  * single trigger at the next arriving sample (a sample can cause at most
  * one trigger, per the §3.1 formalization).
  */
final class TimePeriodTrigger(intervalSec: Long) extends Trigger {
  require(intervalSec > 0, "interval must be positive")
  private var nextBoundary: Option[Long] = None

  override def inform(samples: Seq[NewSample]): Seq[Int] = {
    val out = Seq.newBuilder[Int]
    samples.zipWithIndex.foreach { case (s, i) =>
      nextBoundary match {
        case None => nextBoundary = Some(s.timestampSec + intervalSec)
        case Some(b) if s.timestampSec >= b =>
          out += i
          // Skip boundaries with no data; stay on the fixed grid.
          val periods = (s.timestampSec - b) / intervalSec + 1
          nextBoundary = Some(b + periods * intervalSec)
        case _ => ()
      }
    }
    out.result()
  }
}

/** Resolve a trigger policy from its pipeline name + config. */
object Trigger {
  def byName(id: String, config: Map[String, Double]): Trigger = id match {
    case "DataAmountTrigger" =>
      new DataAmountTrigger(config.getOrElse("data_points_for_trigger",
        throw new IllegalArgumentException("DataAmountTrigger needs data_points_for_trigger")).toInt)
    case "TimeTrigger" | "TimePeriodTrigger" =>
      new TimePeriodTrigger(config.getOrElse("every_seconds",
        throw new IllegalArgumentException("TimeTrigger needs every_seconds")).toLong)
    case other => throw new IllegalArgumentException(s"unknown trigger policy '$other'")
  }
}
