package repro.autoscale

import repro.core.MixSchedule
import scala.collection.mutable

/** A scaling action the online AutoScaler emitted. */
final case class ScaleEvent(step: Int, source: String, fromActors: Int, toActors: Int, reason: String)

/** Online mixture-driven scaling (Sec. 5.2): the Planner's central view of
  * the mixing schedule drives predictive actor scaling. When a source's
  * moving-average sampling weight stays above (below) a threshold for
  * `patience` consecutive intervals, actors are added (reclaimed) and the
  * source's data partitions are resharded over the new actor set.
  *
  * @param baseline   initial actors per source
  * @param emaAlpha   smoothing of the moving-average weight
  * @param patience   consecutive intervals before acting
  * @param maxActors  hard per-source actor bound
  */
final class MixtureScaler(
    baseline: Map[String, Int],
    emaAlpha: Double = 0.3,
    patience: Int = 3,
    maxActors: Int = 64,
) {
  require(baseline.nonEmpty)
  private val fairShare        = 1.0 / baseline.size
  private val ema              = mutable.Map.empty[String, Double]
  private val overStreak       = mutable.Map.empty[String, Int].withDefaultValue(0)
  private val underStreak      = mutable.Map.empty[String, Int].withDefaultValue(0)
  private val actors           = mutable.Map.empty[String, Int] ++= baseline
  private val log              = mutable.ArrayBuffer.empty[ScaleEvent]

  def currentActors: Map[String, Int] = actors.toMap
  def events: Seq[ScaleEvent]         = log.toSeq

  /** Demand-proportional actor target for a smoothed weight `m`. */
  private def targetActors(s: String, m: Double): Int =
    math.min(maxActors, math.max(baseline(s), math.ceil(baseline(s) * m / fairShare).toInt))

  /** Observe one interval of the schedule; returns events emitted now.
    * A source whose demand-proportional target stays above (below) its
    * current allocation for `patience` consecutive intervals is scaled to
    * the target; the streaks provide hysteresis against weight jitter.
    */
  def observe(schedule: MixSchedule, step: Int): Seq[ScaleEvent] = {
    val w = schedule.weights(step)
    val z = math.max(1e-12, w.values.sum)
    val emitted = mutable.ArrayBuffer.empty[ScaleEvent]
    baseline.keys.foreach { s =>
      val now  = w.getOrElse(s, 0.0) / z
      val prev = ema.getOrElse(s, now)
      val m    = emaAlpha * now + (1 - emaAlpha) * prev
      ema(s) = m

      val cur    = actors(s)
      val target = targetActors(s, m)
      if (target > cur) { overStreak(s) += 1; underStreak(s) = 0 }
      else if (target < cur) { underStreak(s) += 1; overStreak(s) = 0 }
      else { overStreak(s) = 0; underStreak(s) = 0 }

      if (overStreak(s) >= patience) {
        actors(s) = target
        emitted += ScaleEvent(step, s, cur, target, f"ema=${m}%.3f demands $target actors")
        overStreak(s) = 0
      } else if (underStreak(s) >= patience && cur > baseline(s)) {
        actors(s) = target
        emitted += ScaleEvent(step, s, cur, target, f"ema=${m}%.3f idles down to $target actors")
        underStreak(s) = 0
      }
    }
    log ++= emitted
    emitted.toSeq
  }

  /** Live resharding: the source's `partitions` data shards redistributed
    * over the current actor set, contiguous and near-even (Sec. 5.2
    * "reshard data partitions live").
    */
  def reshard(source: String, partitions: Int): Seq[Range] = {
    val n = actors(source)
    val base = partitions / n; val extra = partitions % n
    (0 until n).map { a =>
      val start = a * base + math.min(a, extra)
      start until (start + base + (if (a < extra) 1 else 0))
    }
  }
}
