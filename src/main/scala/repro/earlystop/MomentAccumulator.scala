package repro.earlystop

import org.apache.spark.util.AccumulatorV2
import scala.collection.mutable

/** Which per-fact pre-aggregated value a moment cell tracks. */
object Kind {
  val Avg = 0  // per-fact average of the measure's values (for avg MDAs)
  val Sum = 1  // per-fact sum (for sum MDAs)
  val Min = 2  // per-fact min (for min MDAs)
  val Max = 3  // per-fact max (for max MDAs)
  val Size = 4 // exact group size (window count, recorded once per group)
}

/** Key of one moment cell: aggregate group × measure × value kind × batch. */
final case class MomentKey(group: String, measure: Int, kind: Int, batch: Int)

/** Spark accumulator gathering the per-group sample moments during the
  * single scan of the stratified sample (the "accumulator-based stopping
  * condition" of the reproduction brief): executors fold each sampled
  * fact's pre-aggregated measure values into (n, Σx, Σx², min, max) cells;
  * the driver then evaluates the confidence intervals between batches
  * without ever collecting raw sample rows.
  */
final class MomentAccumulator
    extends AccumulatorV2[(MomentKey, Double), mutable.Map[MomentKey, Stats.Moments]] {

  private val map = mutable.Map.empty[MomentKey, Stats.Moments]

  override def isZero: Boolean = map.isEmpty

  override def copy(): MomentAccumulator = {
    val acc = new MomentAccumulator
    map.foreach { case (k, m) => acc.map(k) = m.copy() }
    acc
  }

  override def reset(): Unit = map.clear()

  override def add(v: (MomentKey, Double)): Unit =
    map.getOrElseUpdate(v._1, new Stats.Moments).add(v._2)

  override def merge(other: AccumulatorV2[(MomentKey, Double), mutable.Map[MomentKey, Stats.Moments]]): Unit =
    other.value.foreach { case (k, m) => map.getOrElseUpdate(k, new Stats.Moments).merge(m) }

  override def value: mutable.Map[MomentKey, Stats.Moments] = map
}
