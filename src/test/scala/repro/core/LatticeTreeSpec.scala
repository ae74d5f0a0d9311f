package repro.core

import org.scalatest.funsuite.AnyFunSuite

class LatticeTreeSpec extends AnyFunSuite {

  test("nodes enumerates all non-empty sorted subsets") {
    val ns = Lattice.nodes(Seq("a", "b", "c"))
    assert(ns.size === 7)
    assert(ns.forall(n => n == n.sorted))
    assert(ns.toSet === Set(Seq("a"), Seq("b"), Seq("c"), Seq("a", "b"),
                            Seq("a", "c"), Seq("b", "c"), Seq("a", "b", "c")))
  }

  test("mmst: every non-root node has a parent with exactly one more dim") {
    val tree = Lattice.mmst(Seq("a", "b", "c"), Map("a" -> 10L, "b" -> 2L, "c" -> 5L))
    assert(tree.size === 6)
    tree.foreach { case (child, parent) =>
      assert(parent.size === child.size + 1)
      assert(child.forall(parent.contains))
    }
  }

  test("mmst picks the parent adding the smallest-cardinality dimension") {
    val tree = Lattice.mmst(Seq("a", "b", "c"), Map("a" -> 10L, "b" -> 2L, "c" -> 5L))
    assert(tree(Seq("a")) === Seq("a", "b"))      // +b (2) beats +c (5)
    assert(tree(Seq("c")) === Seq("b", "c"))      // +b (2) beats +a (10)
    assert(tree(Seq("a", "c")) === Seq("a", "b", "c")) // only parent
  }

  test("mmst forms a tree rooted at the full dimension set") {
    val root = Seq("a", "b", "c", "d")
    val tree = Lattice.mmst(root, root.map(_ -> 3L).toMap)
    // Walking parents from any node terminates at the root.
    for (n <- Lattice.nodes(root) if n != root) {
      var cur = n; var steps = 0
      while (cur != root && steps < 10) { cur = tree(cur); steps += 1 }
      assert(cur === root)
    }
  }

  test("children inverts the parent map") {
    val tree = Lattice.mmst(Seq("a", "b"), Map("a" -> 1L, "b" -> 1L))
    val kids = Lattice.children(tree)
    assert(kids(Seq("a", "b")).toSet === Set(Seq("a"), Seq("b")))
    assert(kids(Seq("x")) === Seq.empty)
  }

  test("single-dimension lattice has one node and an empty tree") {
    assert(Lattice.nodes(Seq("a")) === Seq(Seq("a")))
    assert(Lattice.mmst(Seq("a"), Map("a" -> 1L)) === Map.empty)
  }

  test("deterministic tie-breaking on equal cardinalities") {
    val t1 = Lattice.mmst(Seq("a", "b", "c"), Map("a" -> 2L, "b" -> 2L, "c" -> 2L))
    val t2 = Lattice.mmst(Seq("a", "b", "c"), Map("a" -> 2L, "b" -> 2L, "c" -> 2L))
    assert(t1 === t2)
    assert(t1(Seq("c")) === Seq("a", "c")) // lexicographically smallest addition
  }
}
