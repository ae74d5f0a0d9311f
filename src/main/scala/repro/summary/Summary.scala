package repro.summary

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.rdf.Triples

/** Structural summary of an RDF graph (RDFQuotient-lite).
  *
  * The paper uses the RDFQuotient tool to partition RDF nodes into
  * equivalence classes of structurally similar nodes, used both to
  * enumerate properties quickly and as summary-based CFSs. We implement the
  * closest laptop-scale equivalent: **characteristic sets** — two nodes are
  * equivalent iff they have exactly the same set of outgoing (non-type)
  * properties. Like RDFQuotient's quotient classes, members of a class share
  * many properties, which makes them good candidates to analyse together
  * (DESIGN.md §6).
  */
object Summary {

  /** `(fact, cs)` — each subject mapped to its characteristic set, encoded
    * as the `|`-joined sorted list of its outgoing properties.
    */
  def characteristicSets(triples: DataFrame): DataFrame =
    triples.filter(col("p") =!= Triples.TypeProperty)
      .groupBy(col("s").as("fact"))
      .agg(concat_ws("|", sort_array(collect_set(col("p")))).as("cs"))

  /** Summary classes with at least `minSize` members, largest first:
    * `(cs, size)` rows.
    */
  def classes(triples: DataFrame, minSize: Long): Seq[(String, Long)] =
    characteristicSets(triples)
      .groupBy("cs").agg(count("*").as("n"))
      .filter(col("n") >= minSize)
      .orderBy(col("n").desc, col("cs"))
      .collect().map(r => (r.getString(0), r.getLong(1))).toSeq

  /** Facts belonging to one summary class. */
  def classMembers(triples: DataFrame, cs: String): DataFrame =
    characteristicSets(triples).filter(col("cs") === cs).select("fact")
}
