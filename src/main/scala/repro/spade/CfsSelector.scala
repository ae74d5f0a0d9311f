package repro.spade

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.rdf.Triples
import repro.summary.Summary

/** Candidate Fact Set selection (paper §3, Step 1).
  *
  * Three strategies: type-based (one CFS per `rdf:type`), property-based
  * (user-given property sets) and summary-based (one CFS per structural
  * summary class). CFSs with identical member sets are de-duplicated (a
  * summary class frequently coincides with a type), and the result is capped
  * to the `maxCfs` largest sets of at least `minCfsSize` facts.
  */
object CfsSelector {

  /** A named candidate fact set. */
  final case class Cfs(name: String, facts: DataFrame, size: Long)

  def select(triples: DataFrame, cfg: SpadeConfig,
             propertySets: Seq[Seq[String]] = Nil): Seq[Cfs] = {
    val typeBased = Triples.types(triples).map { t =>
      val f = Triples.nodesOfType(triples, t)
      Cfs(s"type:$t", f, f.count())
    }
    val propBased = propertySets.map { ps =>
      val f = Triples.nodesWithProperties(triples, ps)
      Cfs(s"props:${ps.mkString("+")}", f, f.count())
    }
    val summaryBased = Summary.classes(triples, cfg.minCfsSize).map { case (cs, n) =>
      Cfs(s"summary:${cs.hashCode.toHexString}", Summary.classMembers(triples, cs), n)
    }
    val all = (typeBased ++ propBased ++ summaryBased).filter(_.size >= cfg.minCfsSize)

    // De-duplicate identical member sets via (size, order-independent hash).
    val seen = scala.collection.mutable.Set.empty[(Long, Long)]
    val distinctCfs = all.flatMap { c =>
      // bit_xor: order-independent and overflow-free (ANSI mode forbids
      // summing hashes — long overflow).
      val sig = (c.size,
        c.facts.agg(expr("bit_xor(xxhash64(fact))")).collect()(0).getLong(0))
      if (seen.add(sig)) Some(c) else None
    }
    distinctCfs.sortBy(c => (-c.size, c.name)).take(cfg.maxCfs)
  }
}
