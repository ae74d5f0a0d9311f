package repro.earlystop

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.{Arm, Interestingness}
import repro.spade._

/** Early-stop aggregate pruning (paper §5).
  *
  * For every node of a lattice, draws a stratified per-group sample (size
  * `cfg.sampleSize`, processed in `cfg.batches` batches) of the node's
  * facts, estimates each candidate MDA's interestingness from the sampled
  * pre-aggregated measure values, surrounds the estimate with a
  * large-sample delta-method confidence interval (Theorem 2 / Appendices
  * A-C) and prunes every MDA whose CI upper bound falls below the k-th best
  * lower bound seen so far. Pruned MDAs skip measure computation.
  *
  * Estimators per aggregate function:
  *  - `avg`: group estimate = mean of per-fact averages, CI via delta
  *    method with per-group variance sigma^2_i / n_i;
  *  - `sum`: S_i = c_i * Ybar_i with exact group sizes c_i (Appendix B; the
  *    paper may overestimate c_i in child nodes, ours are exact — see
  *    DESIGN.md §6), variance term c_i^2 sigma^2_i / n_i;
  *  - `min`/`max`: point estimate = sample min/max; for variance
  *    interestingness the upper bound is Popoviciu's (b_max − b_min)²/4
  *    over the measure's global bounds and the lower bound is 0
  *    (conservative reading of Appendix C); other interestingness functions
  *    get an unbounded CI (never pruned).
  *
  * The paper's eps_r = sqrt(z² tau² / r) divides by the sample size twice
  * (its tau² already contains sigma²_s / r); we implement the statistically
  * standard eps = z * sqrt(sum_s (dh/dy_s)² * Var(Yhat_s)), noted in
  * EXPERIMENTS.md.
  *
  * Implementation: ALL nodes of a lattice are handled in ONE Spark job over
  * the lattice's membership frame `(node, gk, fact)` — a window per
  * `(node, group)` keeps the first `sampleSize` facts in deterministic hash
  * order (equivalent to the paper's reservoir: both yield a uniform sample
  * per stratum) and measures the exact group total on the way (these totals
  * become the `count(*)` MDAs and the c_i of the sum estimator). Executors
  * fold per-(node, group, measure, batch) moments into a custom
  * `MomentAccumulator` — the "accumulator-based stopping condition" of the
  * reproduction brief — and the driver replays the batch loop over the
  * accumulated moments. The pruning threshold combines the exact scores the
  * ARM holds so far with the CI lower bounds of the still-alive estimates,
  * exactly the paper's Figure 5 procedure.
  */
final class EarlyStop(h: Interestingness, cfg: EsConfig, k: Int, arm: Arm,
                      seed: Long = 42L) {

  private val z = Stats.zFor(cfg.alpha)
  private val batchSize = math.max(1, cfg.sampleSize / cfg.batches)

  /** Number of sampling jobs run (one per lattice). */
  var sampledLattices: Int = 0

  /** Separator between node tag and group key inside moment keys (tags are
    * comma-joined attribute names and never contain it).
    */
  private val TagSep = "\u0000"

  private def kindFor(fn: AggFn): Int = fn match {
    case AggFn.Avg => Kind.Avg
    case AggFn.Sum => Kind.Sum
    case AggFn.Min => Kind.Min
    case AggFn.Max => Kind.Max
    case AggFn.Count => throw new IllegalArgumentException("count(*) is evaluated exactly")
  }

  /** Decide, for every node of one lattice, which candidate measure MDAs
    * survive.
    *
    * Sampling strategy: the paper fills one reservoir per aggregate group.
    * A sort-based per-group top-`sampleSize` (window `row_number`) would
    * cost as much as the aggregation early-stop tries to avoid, so the
    * distributed adaptation is **hash-Bernoulli stratified selection**:
    * from the exact group sizes (counts phase) the driver computes a keep
    * probability p_g = min(1, sampleSize / c_g) per (node, group); a
    * deterministic per-fact hash then selects ~sampleSize facts per group
    * in a plain filter — a simple random sample per stratum, no sort.
    * Only the selected rows are joined with the measures.
    *
    * @param cells lattice membership frame `(node, gk, fact)`, fact-distinct
    * @param candidatesByTag per node tag, the not-yet-evaluated measure MDAs
    * @param groupSizes      per node tag, exact group sizes (counts phase)
    * @return per node tag: (survivors, pruned)
    */
  def filterLattice(cells: DataFrame, candidatesByTag: Map[String, Seq[MdaKey]],
                    groupSizes: Map[String, Map[String, Long]],
                    preAgg: PreAgg.PreAggFrame, attrStats: Map[String, AttrStats])
      : Map[String, (Seq[MdaKey], Seq[MdaKey])] = {
    val active = candidatesByTag.filter(_._2.nonEmpty)
    if (active.isEmpty)
      return candidatesByTag.map { case (t, c) => t -> ((c, Seq.empty[MdaKey])) }
    sampledLattices += 1
    val spark = cells.sparkSession
    import spark.implicits._
    val activeTags = active.keys.toSeq.sorted
    val measures = active.valuesIterator.flatten.map(_.measure).toSeq.distinct.sorted
    val mIdx = measures.zipWithIndex.toMap
    val kindsNeeded: Map[String, Set[Int]] =
      active.valuesIterator.flatten.toSeq.groupBy(_.measure)
        .map { case (m, ks) => m -> ks.map(x => kindFor(x.fn)).toSet }

    // Per-group keep probabilities from the exact sizes.
    val probRows: Seq[(String, String, Double)] = for {
      t <- activeTags
      (g, c) <- groupSizes.getOrElse(t, Map.empty).toSeq
    } yield (t, g, math.min(1.0, cfg.sampleSize.toDouble / math.max(1L, c)))
    val probDf = broadcast(probRows.toDF("node", "gk", "p"))

    // One cheap sampling job: hash filter, then measures for sampled rows
    // only; a second hash splits the sample into the batches.
    val u = (pmod(xxhash64(col("fact"), lit(seed)), lit(1000000L)).cast("double") / 1000000.0)
    val base0 = cells.filter(col("node").isin(activeTags: _*))
      .join(probDf, Seq("node", "gk"))
      .filter(u < col("p"))
    val joined = base0.join(broadcast(preAgg.df), Seq("fact"), "left")
    val sampled = joined.select(col("node") +: col("gk") +:
        pmod(xxhash64(col("fact"), lit(seed + 1)), lit(cfg.batches)).cast("int").as("batch") +:
        measures.flatMap(m => Seq(
          col(preAgg.cntCol(m)), col(preAgg.sumCol(m)),
          col(preAgg.minCol(m)), col(preAgg.maxCol(m)))): _*)

    val acc = new MomentAccumulator
    spark.sparkContext.register(acc, "earlyStopMoments")
    val nMeasures = measures.size
    val kindsArr: Array[Set[Int]] = measures.map(kindsNeeded).toArray
    val nBatches = cfg.batches // local copies: the closure must not capture `this`
    val tagSep = TagSep
    sampled.foreachPartition { rows: Iterator[org.apache.spark.sql.Row] =>
      rows.foreach { r =>
        val group = r.getString(0) + tagSep + r.getString(1)
        val batch = math.min(r.getInt(2), nBatches - 1)
        var i = 0
        while (i < nMeasures) {
          val base = 3 + i * 4
          if (!r.isNullAt(base) && r.getLong(base) > 0) {
            val cnt = r.getLong(base)
            val sumV = r.getDouble(base + 1)
            val kinds = kindsArr(i)
            if (kinds.contains(Kind.Avg)) acc.add((MomentKey(group, i, Kind.Avg, batch), sumV / cnt))
            if (kinds.contains(Kind.Sum)) acc.add((MomentKey(group, i, Kind.Sum, batch), sumV))
            if (kinds.contains(Kind.Min)) acc.add((MomentKey(group, i, Kind.Min, batch), r.getDouble(base + 2)))
            if (kinds.contains(Kind.Max)) acc.add((MomentKey(group, i, Kind.Max, batch), r.getDouble(base + 3)))
          }
          i += 1
        }
      }
    }
    val moments = acc.value

    // Cumulative per-(node, group, measure, kind) moments up to batch b.
    def cumulative(tag: String, groups: Seq[String], m: String, kind: Int,
                   upToBatch: Int): Map[String, Stats.Moments] = {
      val out = scala.collection.mutable.Map.empty[String, Stats.Moments]
      var b = 0
      while (b <= upToBatch) {
        groups.foreach { g =>
          moments.get(MomentKey(tag + TagSep + g, mIdx(m), kind, b)).foreach { mm =>
            out.getOrElseUpdate(g, new Stats.Moments).merge(mm)
          }
        }
        b += 1
      }
      out.toMap
    }

    final case class Ci(lower: Double, upper: Double)

    def ciFor(tag: String, key: MdaKey, upToBatch: Int): Ci = {
      val sizes = groupSizes.getOrElse(tag, Map.empty)
      val groups = sizes.keys.toSeq.sorted
      val kind = kindFor(key.fn)
      val cum = cumulative(tag, groups, key.measure, kind, upToBatch)
      val present = groups.filter(g => cum.get(g).exists(_.n > 0))
      if (present.size < 2) return Ci(0.0, 0.0) // degenerate: score is 0
      key.fn match {
        case AggFn.Avg | AggFn.Sum =>
          val scale: String => Double =
            if (key.fn == AggFn.Sum) g => sizes(g).toDouble else _ => 1.0
          val y = present.map(g => scale(g) * cum(g).mean).toArray
          val varTerms = present.map { g =>
            val m = cum(g); val s = scale(g)
            s * s * m.variance / math.max(1L, m.n)
          }.toArray
          val score = h.score(y)
          val grad = h.gradient(y)
          val eps = z * math.sqrt(grad.zip(varTerms).map { case (g, v) => g * g * v }.sum)
          Ci(score - eps, score + eps)
        case AggFn.Min | AggFn.Max =>
          val y = present.map { g =>
            if (key.fn == AggFn.Min) cum(g).min else cum(g).max
          }.toArray
          val score = h.score(y)
          if (h == Interestingness.Variance) {
            val st = attrStats(key.measure)
            val span = (for (lo <- st.minNum; hi <- st.maxNum) yield hi - lo).getOrElse(0.0)
            Ci(0.0, math.max(score, 0.25 * span * span)) // Popoviciu upper bound
          } else Ci(Double.NegativeInfinity, Double.PositiveInfinity)
        case AggFn.Count =>
          throw new IllegalStateException("count(*) is evaluated exactly, not estimated")
      }
    }

    // Batch loop over ALL candidates of the lattice at once (paper Fig. 5).
    var alive: Vector[(String, MdaKey)] =
      activeTags.flatMap(t => active(t).map(t -> _)).toVector
    val cut = scala.collection.mutable.ArrayBuffer.empty[(String, MdaKey)]
    var b = 0
    var prunedInLastBatch = true
    while (b < cfg.batches && alive.nonEmpty && (prunedInLastBatch || b == 0)) {
      val cis = alive.map { case (t, kk) => (t, kk) -> ciFor(t, kk, b) }.toMap
      val lowerBounds =
        arm.all.map { case (kk, _) => arm.score(kk).get } ++
          alive.map(tk => cis(tk).lower)
      val threshold =
        if (lowerBounds.size < k) Double.NegativeInfinity
        else lowerBounds.sorted(Ordering[Double].reverse)(k - 1)
      val (dead, keep) = alive.partition(tk => cis(tk).upper < threshold)
      prunedInLastBatch = dead.nonEmpty
      cut ++= dead
      alive = keep
      b += 1
    }

    val keptByTag = alive.groupBy(_._1).map { case (t, v) => t -> v.map(_._2).toSeq }
    val cutByTag = cut.groupBy(_._1).map { case (t, v) => t -> v.map(_._2).toSeq }
    candidatesByTag.map { case (t, c) =>
      if (c.isEmpty) t -> ((Seq.empty[MdaKey], Seq.empty[MdaKey]))
      else t -> ((keptByTag.getOrElse(t, Seq.empty), cutByTag.getOrElse(t, Seq.empty)))
    }
  }
}
