package repro.spade

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Aggregate Enumeration (paper §3, Step 3).
  *
  * (a) classifies analysed attributes into dimension and measure candidates
  *     using the paper's rules (frequent; dimensions must not have too many
  *     distinct values);
  * (b) finds the Maximal Frequent Sets of dimension attributes (Apriori,
  *     levelwise, capped at `maxLatticeDims`) — each is the root of one
  *     lattice; sets mixing an attribute with one derived from it are
  *     rejected;
  * (c) assigns each lattice all measures that are neither its dimensions nor
  *     derived from / base of one of them.
  */
object Enumeration {

  /** Attribute pool of one CFS after online analysis. */
  final case class Pool(attrs: Map[String, AttrInfo], dims: Seq[String],
                        measures: Seq[String])

  /** Rule-based classification of the analysed attributes (paper rules i-ii). */
  def classify(attrs: Map[String, AttrInfo], cfsSize: Long, cfg: SpadeConfig): Pool = {
    val minSupport = math.max(1L, (cfg.minSupportFrac * cfsSize).toLong)
    val maxDistinct = math.min(cfg.maxDistinctDim.toLong,
                               math.max(2L, (cfg.maxDistinctFrac * cfsSize).toLong))
    val dims = attrs.collect {
      case (name, info)
          if info.stats.support >= minSupport &&
             info.stats.nDistinct >= 2 && info.stats.nDistinct <= maxDistinct &&
             !info.stats.isLink && !info.stats.isText =>
        name
    }.toSeq.sorted
    val measures = attrs.collect {
      case (name, info)
          if info.stats.isNumeric && info.stats.support >= minSupport &&
             !info.stats.isLink =>
        name
    }.toSeq.sorted
    Pool(attrs, dims, measures)
  }

  /** Support-weighted distinct per-fact dimension sets, collected once; the
    * driver-side Apriori below counts subset support against them.
    */
  def factAttrSets(bag: DataFrame, dims: Seq[String]): Seq[(Set[String], Long)] = {
    if (dims.isEmpty) return Nil
    bag.filter(col("attr").isin(dims: _*))
      .select("attr", "fact").distinct()
      .groupBy("fact").agg(sort_array(collect_set(col("attr"))).as("attrs"))
      .groupBy("attrs").agg(count(lit(1)).as("n"))
      .collect()
      .map(r => (r.getSeq[String](0).toSet, r.getLong(1))).toSeq
  }

  private def support(s: Set[String], setCounts: Seq[(Set[String], Long)]): Long =
    setCounts.iterator.filter { case (t, _) => s.subsetOf(t) }.map(_._2).sum

  /** Maximal frequent dimension sets of size ≤ `maxLatticeDims`.
    *
    * A candidate containing two attributes derived one from the other is
    * pruned (paper rule: e.g. `nationality` and `count(nationality)` cannot
    * be dimensions of the same lattice).
    */
  def maximalFrequentSets(pool: Pool, setCounts: Seq[(Set[String], Long)],
                          cfsSize: Long, cfg: SpadeConfig): Seq[Set[String]] = {
    val minSupport = math.max(1L, (cfg.minSupportFrac * cfsSize).toLong)
    def conflictFree(s: Set[String]): Boolean = {
      val infos = s.toSeq.map(pool.attrs)
      !infos.combinations(2).exists { case Seq(a, b) => a.derivedFromEachOther(b) }
    }
    var level: Seq[Set[String]] =
      pool.dims.map(Set(_)).filter(s => support(s, setCounts) >= minSupport)
    val frequent = scala.collection.mutable.ArrayBuffer.empty[Set[String]]
    frequent ++= level
    var size = 1
    while (level.nonEmpty && size < cfg.maxLatticeDims) {
      val candidates = (for {
        a <- level; d <- pool.dims if !a.contains(d)
      } yield a + d).distinct
        .filter(c => c.subsets(size).forall(sub => frequent.contains(sub)))
        .filter(conflictFree)
      level = candidates.filter(c => support(c, setCounts) >= minSupport)
      frequent ++= level
      size += 1
    }
    val all = frequent.toSeq
    all.filter(s => !all.exists(t => s != t && s.subsetOf(t)))
      .sortBy(s => (-support(s, setCounts), s.toSeq.sorted.mkString(",")))
  }

  /** Build the lattice specs of one CFS (maximal sets → dims; measures =
    * numeric attributes not dimension-related), capped at `maxLattices`.
    */
  def lattices(pool: Pool, setCounts: Seq[(Set[String], Long)], cfsSize: Long,
               cfg: SpadeConfig): Seq[LatticeSpec] = {
    val roots = maximalFrequentSets(pool, setCounts, cfsSize, cfg).take(cfg.maxLattices)
    roots.map { dims =>
      val dimInfos = dims.toSeq.map(pool.attrs)
      val ms = pool.measures.filterNot { m =>
        dims.contains(m) || dimInfos.exists(d => pool.attrs(m).derivedFromEachOther(d))
      }
      LatticeSpec(dims.toSeq.sorted, ms)
    }
  }

  /** All distinct MDAs induced by a set of lattices on one CFS: per
    * non-empty dimension subset, one `count(*)` MDA plus
    * {sum, avg, min, max} × measure. Shared nodes are counted once
    * (DESIGN.md §5).
    */
  def mdaKeys(cfsName: String, specs: Seq[LatticeSpec]): Set[MdaKey] =
    specs.flatMap { spec =>
      spec.dims.toSet.subsets().filter(_.nonEmpty).flatMap { nodeDims =>
        val d = nodeDims.toSeq.sorted
        MdaKey(cfsName, d, "*", AggFn.Count) +:
          spec.measures.flatMap(m => AggFn.measureFns.map(f => MdaKey(cfsName, d, m, f)))
      }
    }.toSet
}
