package repro.spade

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{Arm, Interestingness, MVDCube}
import repro.earlystop.EarlyStop
import repro.rdf.Triples

/** The Spade pipeline (paper §3, Fig. 2), end to end.
  *
  * `prepare` runs everything up to (and including) Aggregate Enumeration —
  * CFS selection, attribute analysis, derivations, lattice construction,
  * pre-aggregated measures — and returns the per-CFS artifacts, so callers
  * can evaluate them with MVDCube (with or without early-stop) or with the
  * PGCube baseline over the *same* candidate aggregates. `run` is the
  * one-call variant: prepare → evaluate (MVDCube) → top-k.
  */
object Spade {

  /** Everything known about one CFS after Steps 1-3. */
  final case class PreparedCfs(cfs: CfsSelector.Cfs, bag: DataFrame,
                               attrs: Map[String, AttrInfo],
                               lattices: Seq[LatticeSpec],
                               preAgg: PreAgg.PreAggFrame) {
    def attrStats: Map[String, AttrStats] = attrs.map { case (k, v) => k -> v.stats }
    def mdaKeys: Set[MdaKey] = Enumeration.mdaKeys(cfs.name, lattices)
    def unpersist(): Unit = { bag.unpersist(false); preAgg.df.unpersist(false); () }
  }

  /** Identification result of a whole dataset (input of Tables 2-4). */
  final case class Prepared(name: String, nTriples: Long, nProperties: Int,
                            cfss: Seq[PreparedCfs], timingsMs: Map[String, Long]) {
    def nMdas: Int = cfss.map(_.mdaKeys.size).sum
    /** Distinct derived-property names by kind tag (Table 2 columns). */
    def derivedByKind: Map[String, Int] =
      cfss.flatMap(_.attrs.values).filter(_.kind != AttrKind.Direct)
        .groupBy(_.kind.tag).map { case (k, v) => k -> v.map(_.name).distinct.size }
        .withDefaultValue(0)
    def unpersist(): Unit = cfss.foreach(_.unpersist())
  }

  /** Aggregated counters of an evaluation pass. */
  final case class EvalTotals(lattices: Int, nodes: Int, evaluatedMdas: Int,
                              reusedMdas: Int, prunedMdas: Int, wallMs: Long)

  /** Steps 1-3: identify CFSs, analyse attributes, enumerate lattices. */
  def prepare(spark: SparkSession, name: String, triples: DataFrame,
              cfg: SpadeConfig, propertySets: Seq[Seq[String]] = Nil): Prepared = {
    // An RDF graph is a *set* of triples; generators may emit duplicates.
    val t = triples.distinct().cache()
    val nTriples = t.count()
    val nProps = Triples.properties(t).size
    val subjects = Triples.subjects(t).cache()
    val timings = scala.collection.mutable.LinkedHashMap.empty[String, Long]

    def timed[A](step: String)(body: => A): A = {
      val t0 = System.nanoTime(); val r = body
      timings(step) = timings.getOrElse(step, 0L) + (System.nanoTime() - t0) / 1000000
      r
    }

    val cfss = timed("cfsSelection") { CfsSelector.select(t, cfg, propertySets) }

    val prepared = cfss.map { cfs =>
      val facts = cfs.facts.cache()
      val (bag, attrs) = timed("attributeAnalysis") {
        val direct = Attributes.directBag(t, facts)
        val directStats = Attributes.computeStats(direct, subjects)
        val (derivedBag, derivedMeta) =
          if (cfg.deriveProperties) Derivations.deriveAll(t, direct, directStats, cfg)
          else (None, Nil)
        val fullBag = derivedBag.fold(direct)(direct.unionByName(_)).cache()
        // Online Attribute Analysis: one stats pass over direct + derived.
        val allStats = Attributes.computeStats(fullBag, subjects)
        val metaByName = derivedMeta.map(d => d.name -> d).toMap
        val attrInfos: Map[String, AttrInfo] = allStats.map { case (attrName, st) =>
          metaByName.get(attrName) match {
            case Some(d) => attrName -> AttrInfo(attrName, d.kind, Some(d.baseProp), st)
            case None    => attrName -> AttrInfo(attrName, AttrKind.Direct, None, st)
          }
        }
        (fullBag, attrInfos)
      }
      val lattices = timed("aggregateEnumeration") {
        val pool = Enumeration.classify(attrs, cfs.size, cfg)
        val setCounts = Enumeration.factAttrSets(bag, pool.dims)
        Enumeration.lattices(pool, setCounts, cfs.size, cfg)
      }
      val usedMeasures = lattices.flatMap(_.measures).distinct.sorted
      val preAgg = timed("measurePreAggregation") {
        PreAgg.build(bag, facts, usedMeasures)
      }
      PreparedCfs(cfs.copy(facts = facts), bag, attrs, lattices, preAgg)
    }
    subjects.unpersist(false)
    Prepared(name, nTriples, nProps, prepared, timings.toMap)
  }

  /** Step 4: evaluate every lattice of every CFS with MVDCube (+ optional
    * early-stop), pushing results into `arm`.
    */
  def evaluateAll(prepared: Prepared, arm: Arm, esConfig: Option[EsConfig],
                  k: Int): EvalTotals = {
    val t0 = System.nanoTime()
    var lattices = 0; var nodes = 0; var eval = 0; var reused = 0; var pruned = 0
    prepared.cfss.foreach { pc =>
      val es = esConfig.map(c => new EarlyStop(arm.h, c, k, arm))
      // One Spark job (two with early-stop) evaluates ALL lattices of the
      // CFS — shared nodes once, shared measures broadcast once (paper R3).
      val st = MVDCube.evaluateCfs(pc.cfs.name, pc.lattices, pc.bag, pc.cfs.facts,
                                   pc.preAgg, pc.attrStats, arm, es)
      lattices += pc.lattices.size; nodes += st.nodes; eval += st.evaluatedMdas
      reused += st.reusedMdas; pruned += st.prunedMdas
    }
    EvalTotals(lattices, nodes, eval, reused, pruned, (System.nanoTime() - t0) / 1000000)
  }

  /** Full online pipeline: prepare → evaluate → top-k. */
  final case class SpadeResult(prepared: Prepared, arm: Arm, totals: EvalTotals,
                               topK: Seq[(MdaKey, Double)])

  def run(spark: SparkSession, name: String, triples: DataFrame, cfg: SpadeConfig,
          h: Interestingness = Interestingness.Variance): SpadeResult = {
    val prepared = prepare(spark, name, triples, cfg)
    val arm = new Arm(h)
    val totals = evaluateAll(prepared, arm, cfg.earlyStop, cfg.k)
    SpadeResult(prepared, arm, totals, arm.topK(cfg.k))
  }
}
