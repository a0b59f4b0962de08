package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.truss.LocalTruss
import repro.graph.CompactGraph

/** Structural invariants of the truss component tree (Algorithm 4):
  * partition of edges, uniform trussness per node, parent-child K ordering,
  * subtree = k-truss component, stable smallest-edge-id node ids.
  */
class TrussTreeSpec extends AnyFunSuite {

  private def buildFor(g: CompactGraph, anchors: Array[Boolean] = null) = {
    val dec = LocalTruss.decompose(g, anchors)
    (dec, TrussTree.build(g, dec.truss))
  }

  test("every non-anchor edge is in exactly one node; anchors in none") {
    for (seed <- 1 to 15) {
      val g = TestGraphs.random(13, 45, seed * 3 + 1)
      val anchors = LocalTruss.anchorMask(g.m, Seq(seed % g.m))
      val (dec, tree) = buildFor(g, anchors)
      val seen = scala.collection.mutable.HashSet.empty[Int]
      tree.nodes.values.foreach { n =>
        n.edges.foreach { e =>
          assert(!seen.contains(e)); seen += e
          assert(tree.nodeOf(e) == n.id)
        }
      }
      for (e <- 0 until g.m) {
        if (anchors(e)) assert(tree.nodeOf(e) == -1)
        else assert(seen.contains(e))
      }
      assert(dec.truss(seed % g.m) == Int.MaxValue)
    }
  }

  test("all edges of a node share its trussness K and the node id is the min edge id") {
    for (seed <- 1 to 15) {
      val g = TestGraphs.random(13, 45, seed * 5 + 2)
      val (dec, tree) = buildFor(g)
      tree.nodes.values.foreach { n =>
        n.edges.foreach(e => assert(dec.truss(e) == n.k))
        assert(n.id == n.edges.min)
      }
    }
  }

  test("child nodes have strictly larger K than their parent") {
    for (seed <- 1 to 15) {
      val g = TestGraphs.random(13, 45, seed * 7 + 3)
      val (_, tree) = buildFor(g)
      tree.nodes.values.foreach { n =>
        n.children.foreach { c =>
          assert(tree.nodes(c).k > n.k)
          assert(tree.nodes(c).parent == n.id)
        }
      }
    }
  }

  test("subtree edges all have trussness >= the root node's K") {
    for (seed <- 1 to 10) {
      val g = TestGraphs.random(13, 45, seed * 11 + 4)
      val (dec, tree) = buildFor(g)
      tree.nodes.keys.foreach { id =>
        val k = tree.nodes(id).k
        tree.subtreeEdges(id).foreach(e => assert(dec.truss(e) >= k))
      }
    }
  }

  test("subtree is triangle-connected within itself (k-truss component)") {
    for (seed <- 1 to 10) {
      val g = TestGraphs.random(12, 40, seed * 13 + 5)
      val (_, tree) = buildFor(g)
      for (id <- tree.nodes.keys) {
        val edges = tree.subtreeEdges(id).toSet
        if (edges.size > 1) {
          // union-find restricted to the subtree must leave one group,
          // except edges with no triangle inside the subtree (singletons
          // can only be the node's own K=2-style members)
          val uf = scala.collection.mutable.HashMap.empty[Int, Int]
          def find(x: Int): Int = {
            val p = uf.getOrElse(x, x)
            if (p == x) x else { val r = find(p); uf(x) = r; r }
          }
          edges.foreach { e =>
            g.foreachTriangle(e) { (a, b) =>
              if (edges(a) && edges(b)) { uf(find(a)) = find(e); uf(find(b)) = find(e) }
            }
          }
          val roots = edges.map(find)
          // all triangle-participating edges agree on one root
          val triEdges = edges.filter { e =>
            var has = false
            g.foreachTriangle(e)((a, b) => if (edges(a) && edges(b)) has = true)
            has
          }
          assert(triEdges.map(find).size <= 1,
            s"seed=$seed node=$id split into ${roots.size} groups")
        }
      }
    }
  }

  test("clique tree: single node holding every edge") {
    val g = TestGraphs.clique(6)
    val (_, tree) = buildFor(g)
    assert(tree.nodes.size == 1)
    val n = tree.nodes.values.head
    assert(n.k == 6 && n.edges.length == g.m && n.parent == -1)
  }

  test("clique + edge-sharing triangle: triangle node is parent of clique node") {
    // triangle {3,4,5} shares edge (3,4) with the K5, so the two are
    // triangle-connected at level 3: node K=3 holds {(3,5),(4,5)} and its
    // child K=5 holds the ten clique edges
    val clique = for (i <- 0 until 5; j <- (i + 1) until 5) yield (i, j)
    val g = CompactGraph.fromEdges(clique ++ Seq((3, 5), (4, 5)))
    val (_, tree) = buildFor(g)
    assert(tree.nodes.size == 2)
    val Seq(lo, hi) = tree.nodes.values.toSeq.sortBy(_.k)
    assert(lo.k == 3 && hi.k == 5)
    assert(hi.parent == lo.id)
    assert(lo.parent == -1)
    assert(lo.edges.length == 2 && hi.edges.length == 10)
  }

  test("clique + vertex-sharing triangle: two separate root components") {
    // the pendant triangle {4,5,6} shares only a vertex with the K5 — no
    // common triangle, so no triangle-connectivity: two root nodes
    val clique = for (i <- 0 until 5; j <- (i + 1) until 5) yield (i, j)
    val g = CompactGraph.fromEdges(clique ++ Seq((4, 5), (4, 6), (5, 6)))
    val (_, tree) = buildFor(g)
    assert(tree.nodes.size == 2)
    assert(tree.nodes.values.forall(_.parent == -1))
    assert(tree.nodes.values.map(_.k).toSet == Set(3, 5))
  }

  test("partial rebuild after anchoring equals a from-scratch build") {
    for (seed <- 1 to 12) {
      val g = TestGraphs.random(13, 48, seed * 23 + 8)
      val dec0 = LocalTruss.decompose(g)
      val t0 = TrussTree.build(g, dec0.truss)
      val x = (seed * 5) % g.m
      val anchors = LocalTruss.anchorMask(g.m, Seq(x))
      val dec1 = LocalTruss.decompose(g, anchors)
      val dirty = (0 until g.m).filter(e =>
        dec1.truss(e) != dec0.truss(e) || dec1.layer(e) != dec0.layer(e)) :+ x
      val partial = TrussTree.rebuild(g, dec1.truss, t0, dirty)
      val scratch = TrussTree.build(g, dec1.truss)
      assert(partial.nodeOf.sameElements(scratch.nodeOf), s"seed=$seed")
      assert(partial.nodes.keySet == scratch.nodes.keySet)
      partial.nodes.foreach { case (id, n) =>
        val s = scratch.nodes(id)
        assert(n.k == s.k && n.parent == s.parent)
        assert(n.edges.sorted.sameElements(s.edges.sorted))
        assert(n.children.sorted.sameElements(s.children.sorted))
      }
    }
  }

  test("node ids are stable across rebuilds when nothing changes") {
    for (seed <- 1 to 8) {
      val g = TestGraphs.random(13, 45, seed * 17 + 6)
      val dec = LocalTruss.decompose(g)
      val t1 = TrussTree.build(g, dec.truss)
      val t2 = TrussTree.build(g, dec.truss)
      assert(t1.nodes.keySet == t2.nodes.keySet)
      assert(t1.nodeOf.sameElements(t2.nodeOf))
    }
  }

  test("sla contains the nodes of all >=-trussness neighbor edges") {
    for (seed <- 1 to 10) {
      val g = TestGraphs.random(12, 40, seed * 19 + 7)
      val (dec, tree) = buildFor(g)
      for (e <- 0 until g.m) {
        val want = scala.collection.mutable.SortedSet.empty[Int]
        g.foreachTriangle(e) { (a, b) =>
          if (dec.truss(a) >= dec.truss(e)) want += tree.nodeOf(a)
          if (dec.truss(b) >= dec.truss(e)) want += tree.nodeOf(b)
        }
        assert(TrussTree.sla(g, dec.truss, tree.nodeOf, e).toSeq == want.toSeq)
      }
    }
  }

  test("anchors merge components at every level") {
    // two disjoint triangles bridged by a shared edge path through an anchor:
    // triangles {0,1,2} and {3,4,5}, plus bridge edge (2,3) sharing a
    // triangle with both via vertices 1 and 4: add (1,3) and (2,4)
    val g = CompactGraph.fromEdges(Seq(
      (0, 1), (1, 2), (0, 2), (3, 4), (4, 5), (3, 5), (2, 3), (1, 3), (2, 4)))
    // without anchors the two triangles are separate 3-truss components
    val dec0 = LocalTruss.decompose(g)
    val t0 = TrussTree.build(g, dec0.truss)
    // anchoring bridge edges merges connectivity; just assert build succeeds
    val anchors = LocalTruss.anchorMask(g.m, Seq(repro.TestGraphs.edgeId(g, 2, 3)))
    val dec1 = LocalTruss.decompose(g, anchors)
    val t1 = TrussTree.build(g, dec1.truss)
    assert(t0.nodes.nonEmpty && t1.nodes.nonEmpty)
    assert(t1.nodeOf(repro.TestGraphs.edgeId(g, 2, 3)) == -1)
  }
}
