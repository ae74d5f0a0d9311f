package repro.spade

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Pre-aggregated measures (paper §3 offline / §4.3 Measure Loading).
  *
  * For each fact and each measure attribute we pre-compute `count`, `sum`,
  * `min` and `max` of the fact's values once, producing a single wide
  * DataFrame keyed by fact. The frame is cached and **shared across every
  * lattice of the CFS** — the paper's "Measure Loading" sharing, and the
  * reason MVDCube touches the measure tables once, not once per lattice.
  *
  * Multi-valued measures are thereby handled correctly: a group-level
  * aggregate combines per-fact pre-aggregates (Σ of sums, min of mins, …) so
  * each fact contributes exactly once per group no matter how many values or
  * dimension combinations it has.
  */
object PreAgg {

  /** Wide per-fact measure frame with name↔column bookkeeping. */
  final case class PreAggFrame(df: DataFrame, measures: Seq[String]) {
    private val idx = measures.zipWithIndex.toMap
    def cntCol(m: String): String = s"m${idx(m)}_cnt"
    def sumCol(m: String): String = s"m${idx(m)}_sum"
    def minCol(m: String): String = s"m${idx(m)}_min"
    def maxCol(m: String): String = s"m${idx(m)}_max"
  }

  /** Build (and cache) the shared pre-aggregated measure frame of a CFS.
    * Facts without any measure value keep a row (nulls / zero counts) so the
    * later left joins preserve `count(*)` semantics.
    */
  def build(bag: DataFrame, facts: DataFrame, measures: Seq[String]): PreAggFrame = {
    val frame =
      if (measures.isEmpty) facts
      else {
        val v = expr("try_cast(value AS DOUBLE)") // ANSI-safe numeric probe
        val aggs = measures.zipWithIndex.flatMap { case (m, i) =>
          val hit = when(col("attr") === m, v)
          Seq(count(hit).as(s"m${i}_cnt"), sum(hit).as(s"m${i}_sum"),
              min(hit).as(s"m${i}_min"), max(hit).as(s"m${i}_max"))
        }
        val agg = bag.filter(col("attr").isin(measures: _*))
          .groupBy("fact").agg(aggs.head, aggs.tail: _*)
        facts.join(agg, Seq("fact"), "left")
      }
    PreAggFrame(frame.cache(), measures)
  }
}
