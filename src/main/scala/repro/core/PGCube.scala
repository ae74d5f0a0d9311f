package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.spade._

/** PGCube baseline (paper §6, "best-effort baseline"): one-pass
  * `GROUP BY CUBE` over the exploded fact×dimensions join — PostgreSQL's
  * grouping-sets implementation in the paper, Spark's `cube()` here. Both
  * aggregate every grouping set from the *exploded* input rows, in which a
  * fact appears once per combination of its (possibly multiple) dimension
  * values; whenever a multi-valued dimension is rolled up, the fact is
  * counted/summed once per retained row — the paper's Lemma 1 error,
  * reproduced bit-for-bit.
  *
  * Two variants as in the paper: `PGCube*` counts groups with `count(*)`,
  * `PGCube^d` with `count(distinct fact)` (fixes counts, not sums/avgs).
  * min/max are unaffected by duplication and stay correct in both.
  */
object PGCube {

  /** Evaluate one lattice; returns the result of every MDA of the lattice
    * (keyed like MVDCube's, so the two can be diffed group by group).
    */
  def evaluateLattice(cfsName: String, spec: LatticeSpec, bag: DataFrame,
                      facts: DataFrame, preAgg: PreAgg.PreAggFrame,
                      countDistinctFacts: Boolean): Map[MdaKey, AggResult] = {
    val dims = spec.dims
    val n = dims.size
    val cols = dims.indices.map(MVDCube.dimCol)

    // Same data translation as MVDCube: the relational modeling of the facts
    // joined with their dimension tables, then ONE cube query joining in the
    // (pre-aggregated) measures — "each lattice is a separate query that
    // joins the facts with the measures" (paper §6.3).
    val input = MVDCube.rootFrame(bag, facts, dims).join(preAgg.df, Seq("fact"), "left")

    def alias(m: String, f: AggFn) = s"v_${preAgg.measures.indexOf(m)}_${f.name}"
    val countExpr: Column =
      (if (countDistinctFacts) countDistinct(col("fact")) else count(lit(1))).as("cnt_star")
    val measureExprs: Seq[Column] = spec.measures.flatMap { m =>
      val s = sum(col(preAgg.sumCol(m))); val c = sum(col(preAgg.cntCol(m)))
      Seq(s.as(alias(m, AggFn.Sum)),
          min(col(preAgg.minCol(m))).as(alias(m, AggFn.Min)),
          max(col(preAgg.maxCol(m))).as(alias(m, AggFn.Max)),
          when(c > 0, s / c).as(alias(m, AggFn.Avg)))
    }
    val aggExprs = (grouping_id().as("gid") +: countExpr +: measureExprs)
    val outCols = Seq("gid", "cnt_star") ++
      spec.measures.flatMap(m => AggFn.measureFns.map(f => alias(m, f)))
    val rows = input.cube(cols.map(col): _*)
      .agg(aggExprs.head, aggExprs.tail: _*)
      .select(cols.map(col) ++ outCols.map(col): _*)
      .collect()

    val byGid = rows.groupBy(_.getAs[Number]("gid").longValue)
    val results = Map.newBuilder[MdaKey, AggResult]
    for ((gid, nodeRows) <- byGid if gid != (1L << n) - 1) {
      // grouping_id bit (n-1-i) is 1 iff cols(i) is rolled up.
      val keptIdx = dims.indices.filter(i => ((gid >> (n - 1 - i)) & 1L) == 0L)
      val node = keptIdx.map(dims)
      // §2 result semantics (same as MVDCube): groups where a retained
      // dimension is a genuine data null are not part of the MDA result.
      val nonNullRows = nodeRows.filter(r =>
        keptIdx.forall(i => r.getAs[String](MVDCube.dimCol(i)) != null))
      val keys = nonNullRows.map { r =>
        keptIdx.map(i => r.getAs[String](MVDCube.dimCol(i))).mkString(MVDCube.KeySep)
      }
      results += MdaKey(cfsName, node, "*", AggFn.Count) ->
        AggResult(keys, nonNullRows.map(_.getAs[Long]("cnt_star").toDouble))
      for (m <- spec.measures; f <- AggFn.measureFns) {
        val a = alias(m, f)
        val kept = nonNullRows.zip(keys).filter { case (r, _) => r.getAs[Any](a) != null }
        results += MdaKey(cfsName, node, m, f) -> AggResult(
          kept.map(_._2),
          kept.map { case (r, _) =>
            r.getAs[Any](a) match {
              case d: java.lang.Double => d.doubleValue
              case l: java.lang.Long   => l.toDouble
              case b: java.math.BigDecimal => b.doubleValue
              case x => throw new IllegalStateException(s"unexpected type $x")
            }
          })
      }
    }
    results.result()
  }
}

/** Group-by-group comparison of two aggregate results (paper Experiment 2-3:
  * #wrong aggregates and the distribution of error ratios).
  */
object ResultDiff {

  /** True iff both results have the same groups with equal values. */
  def equal(a: AggResult, b: AggResult, relTol: Double = 1e-9): Boolean = {
    val ma = a.toMap; val mb = b.toMap
    ma.keySet == mb.keySet && ma.forall { case (k, va) =>
      val vb = mb(k)
      math.abs(va - vb) <= relTol * math.max(1.0, math.max(math.abs(va), math.abs(vb)))
    }
  }

  /** Per-group error ratios wrong/correct (only for groups present in both
    * with a non-zero correct value) — paper Fig. 10's distribution input.
    */
  def errorRatios(correct: AggResult, wrong: AggResult): Seq[Double] = {
    val mc = correct.toMap
    wrong.groupKeys.zip(wrong.values).collect {
      case (k, vw) if mc.get(k).exists(vc => math.abs(vc) > 1e-12) => vw / mc(k)
    }.toSeq
  }
}
