package repro.spade

/** Aggregate functions Ω = {count, min, max, sum, avg} (paper §2).
  *
  * `Count` is the per-node `count(*)` (number of facts per group); the
  * count-of-values variant `count(M)` is available through pre-aggregated
  * per-fact counts but, like in the paper's examples, the enumerated MDAs
  * use `count(*)` plus {sum, avg, min, max} over numeric measures.
  */
sealed abstract class AggFn(val name: String)
object AggFn {
  case object Count extends AggFn("count")
  case object Sum   extends AggFn("sum")
  case object Avg   extends AggFn("avg")
  case object Min   extends AggFn("min")
  case object Max   extends AggFn("max")
  /** Functions applied to every numeric measure of a lattice. */
  val measureFns: Seq[AggFn] = Seq(Sum, Avg, Min, Max)
  val all: Seq[AggFn] = Count +: measureFns
}

/** How an attribute came to be (paper §3, Derived Property Enumeration). */
sealed abstract class AttrKind(val tag: String)
object AttrKind {
  case object Direct  extends AttrKind("direct")
  case object CountOf extends AttrKind("count")
  case object Keyword extends AttrKind("kw")
  case object Lang    extends AttrKind("lang")
  case object Path    extends AttrKind("path")
}

/** Per-attribute statistics over one CFS (offline + online analysis).
  *
  * @param support     number of facts having ≥1 value for the attribute
  * @param nMultiFacts number of facts having >1 value (multi-valued-ness)
  * @param nDistinct   number of distinct values
  * @param numericFrac fraction of values parseable as Double
  * @param linkFrac    fraction of values that are subjects of the graph
  * @param spaceFrac   fraction of values containing a space (text-ness)
  * @param minNum      minimum numeric value (when numeric)
  * @param maxNum      maximum numeric value (when numeric)
  */
final case class AttrStats(support: Long, nMultiFacts: Long, nDistinct: Long,
                           numericFrac: Double, linkFrac: Double, spaceFrac: Double,
                           minNum: Option[Double], maxNum: Option[Double]) {
  def isMultiValued: Boolean = nMultiFacts > 0
  def isNumeric: Boolean     = numericFrac >= 0.99
  def isLink: Boolean        = linkFrac >= 0.5
  def isText: Boolean        = !isNumeric && !isLink && spaceFrac >= 0.5
}

/** An analysed attribute: a direct property or a derived one.
  *
  * @param baseProp for derived attributes, the property they derive from —
  *                 used by the paper's rule that a lattice must not contain,
  *                 and a measure must not be, an attribute derived from one
  *                 of its dimensions.
  */
final case class AttrInfo(name: String, kind: AttrKind, baseProp: Option[String],
                          stats: AttrStats) {
  /** True iff `this` and `other` are derived one from the other. */
  def derivedFromEachOther(other: AttrInfo): Boolean =
    baseProp.contains(other.name) || other.baseProp.contains(name)
}

/** One lattice: a root dimension set and the measures evaluated with it. */
final case class LatticeSpec(dims: Seq[String], measures: Seq[String]) {
  require(dims == dims.sorted, s"lattice dims must be sorted: $dims")
  def nodeCount: Int = (1 << dims.size) - 1 // non-empty subsets
}

/** Identity of one multidimensional aggregate: (CFS, dim set, measure, f).
  * `measure` is `"*"` for the `count(*)` MDA of a node.
  */
final case class MdaKey(cfs: String, dims: Seq[String], measure: String, fn: AggFn) {
  require(dims == dims.sorted, s"MDA dims must be sorted: $dims")
  override def toString: String =
    s"$cfs | ${fn.name}(${if (measure == "*") "*" else measure}) by ${dims.mkString(", ")}"
}

/** Early-stop configuration (paper §5; Table 4 uses size 60, 2 batches). */
final case class EsConfig(sampleSize: Int = 60, batches: Int = 2, alpha: Double = 0.05)

/** Knobs of the whole pipeline. Thresholds mirror the paper's rules
  * (§3 Step 3): dimensions/measures must be frequent, dimensions must not
  * have too many distinct values, lattices have at most `maxLatticeDims`
  * dimensions. Caps (`maxCfs`, `maxLattices`, `maxPathsPerProp`) bound the
  * laptop-scale run; the paper ran uncapped on a 40-core server.
  */
final case class SpadeConfig(
    minCfsSize: Int        = 100,
    maxCfs: Int            = 8,
    minSupportFrac: Double = 0.1,
    maxDistinctDim: Int    = 100,
    maxDistinctFrac: Double = 0.5,
    maxLatticeDims: Int    = 3,
    maxLattices: Int       = 4,
    maxPathsPerProp: Int   = 8,
    deriveProperties: Boolean = true,
    k: Int                 = 10,
    earlyStop: Option[EsConfig] = None,
)
