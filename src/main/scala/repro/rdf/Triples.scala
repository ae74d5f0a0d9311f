package repro.rdf

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Helpers over the triple representation of an RDF graph.
  *
  * A graph is a `DataFrame(s: String, p: String, o: String)`. Literal values
  * are carried as strings (numeric parsing happens during attribute
  * analysis); URIs are plain strings too — nothing in the pipeline depends on
  * IRI syntax. This mirrors the paper's storage: per-attribute `(s, o)`
  * tables and a single-column table of fact identifiers per CFS.
  */
object Triples {

  /** The property used to attach types to nodes (`rdf:type` in the paper). */
  val TypeProperty = "rdf:type"

  /** Build a triples DataFrame from in-memory tuples (tests, generators). */
  def fromTuples(spark: SparkSession, triples: Seq[(String, String, String)]): DataFrame = {
    import spark.implicits._
    triples.toDF("s", "p", "o")
  }

  /** The `(s, o)` attribute table of property `attr`, with `rdf:type` rows
    * excluded from ordinary attribute access.
    */
  def attributeTable(triples: DataFrame, attr: String): DataFrame =
    triples.filter(col("p") === attr).select(col("s").as("fact"), col("o").as("value"))

  /** All `(node, type)` pairs. A node may have zero, one or several types. */
  def typeTable(triples: DataFrame): DataFrame =
    triples.filter(col("p") === TypeProperty)
      .select(col("s").as("fact"), col("o").as("tpe"))

  /** Distinct non-type properties present in the graph. */
  def properties(triples: DataFrame): Seq[String] =
    triples.filter(col("p") =!= TypeProperty)
      .select("p").distinct().collect().map(_.getString(0)).sorted.toSeq

  /** Distinct types present in the graph. */
  def types(triples: DataFrame): Seq[String] =
    typeTable(triples).select("tpe").distinct().collect().map(_.getString(0)).sorted.toSeq

  /** Single-column DataFrame of fact IDs of all nodes having type `tpe`. */
  def nodesOfType(triples: DataFrame, tpe: String): DataFrame =
    typeTable(triples).filter(col("tpe") === tpe).select("fact").distinct()

  /** Single-column DataFrame of fact IDs of nodes having ALL of `props`. */
  def nodesWithProperties(triples: DataFrame, props: Seq[String]): DataFrame = {
    require(props.nonEmpty, "nodesWithProperties needs at least one property")
    props.map { p =>
      triples.filter(col("p") === p).select(col("s").as("fact")).distinct()
    }.reduce(_.intersect(_))
  }

  /** All subjects appearing in the graph (potential facts). */
  def subjects(triples: DataFrame): DataFrame =
    triples.select(col("s").as("fact")).distinct()
}
