package repro.core

/** Lattice structure and Minimum-Memory-Spanning-Tree (paper §4.1).
  *
  * The lattice over dimensions D has one node per subset of D. ArrayCube
  * picks, per node, a parent to compute it from, minimizing the total memory
  * held during the one pass. In the DataFrame setting "memory" is the cached
  * parent frame, so our MMST analog picks, for each node, the parent with
  * the smallest estimated size: the parent that *adds* the dimension with
  * the fewest distinct values (all parents of a node share the node's own
  * dimensions, so only the added dimension differentiates their sizes).
  * Correctness does not depend on the choice (DESIGN.md §2) — only the size
  * of the frames kept cached does.
  */
object Lattice {

  /** All non-empty dimension subsets, each as a sorted Seq. */
  def nodes(rootDims: Seq[String]): Seq[Seq[String]] =
    rootDims.toSet.subsets().filter(_.nonEmpty).map(_.toSeq.sorted).toSeq

  /** Parent assignment: every non-root node → the parent it is computed
    * from. `distinctCounts` gives |dom(D)| per dimension (from attribute
    * stats); ties break lexicographically for determinism.
    */
  def mmst(rootDims: Seq[String], distinctCounts: Map[String, Long])
      : Map[Seq[String], Seq[String]] = {
    val root = rootDims.sorted
    nodes(rootDims).filter(_ != root).map { node =>
      val candidates = rootDims.filterNot(node.contains)
      val added = candidates.minBy(d => (distinctCounts.getOrElse(d, Long.MaxValue), d))
      node -> (node :+ added).sorted
    }.toMap
  }

  /** Children of each node in the spanning tree (root included as a key). */
  def children(tree: Map[Seq[String], Seq[String]]): Map[Seq[String], Seq[Seq[String]]] =
    tree.toSeq.groupBy(_._2).map { case (p, kids) => p -> kids.map(_._1).sorted(Ordering.by((s: Seq[String]) => s.mkString(","))) }
      .withDefaultValue(Seq.empty)
}
