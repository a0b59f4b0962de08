package repro.core

import repro.graph.CompactGraph
import scala.collection.mutable

/** The truss component tree (paper's Algorithm 4 / Table II).
  *
  * Every non-anchored edge belongs to exactly one tree node; all edges of a
  * node share a trussness value `K`, and the subgraph induced by the edges
  * in the subtree rooted at a node is a `K`-truss component (Definition 9).
  * A node's id is the smallest edge id among its own edges, which makes ids
  * deterministic and stable: a node whose edge set is unchanged across a
  * rebuild keeps its id, which is what the GAS reuse bookkeeping keys on.
  *
  * Anchored edges (trussness Int.MaxValue) participate in triangle
  * connectivity at *every* level — an anchor bridging two components merges
  * them, exactly as it does for follower propagation — but belong to no
  * node (`nodeOf = -1`).
  *
  * [[TrussTree.rebuild]] exploits that *top-level* components (triangle
  * connectivity over the full edge set, which ignores trussness) never
  * change when an edge is anchored: anchoring only moves the edge from
  * member to connector, leaving every union intact. Only the top components
  * containing an edge whose trussness/anchor status changed are re-peeled;
  * all other nodes are carried over verbatim.
  */
final class TrussTree(
    val nodes: Map[Int, TrussTree.Node],
    /** edge id -> tree node id (-1 for anchors) */
    val nodeOf: Array[Int],
) {

  /** All edge ids in the subtree rooted at node `id`. */
  def subtreeEdges(id: Int): Array[Int] = {
    val buf = mutable.ArrayBuffer.empty[Int]
    val stack = mutable.Stack(id)
    while (stack.nonEmpty) {
      val n = nodes(stack.pop())
      buf ++= n.edges
      n.children.foreach(stack.push)
    }
    buf.toArray
  }

  /** Root-node ids (parent == -1). */
  def roots: Iterable[Int] = nodes.values.filter(_.parent == -1).map(_.id)

  /** Top-level root id owning edge `e` (-1 for anchors). */
  def rootOf(e: Int): Int = {
    var id = nodeOf(e)
    if (id == -1) return -1
    while (nodes(id).parent != -1) id = nodes(id).parent
    id
  }
}

object TrussTree {

  /** A tree node: `id` = smallest member edge id (paper's TN.I), `k` = the
    * shared trussness (TN.K), `edges` = TN.E, `parent` = parent node id or
    * -1 (TN.P), `children` = child node ids (TN.C).
    */
  final case class Node(id: Int, k: Int, edges: Array[Int],
                        parent: Int, children: Array[Int])

  /** Build the full tree for graph `g` under trussness `truss` (paper's
    * Algorithm 4, virtual empty root). Anchors are edges with
    * `truss(e) == Int.MaxValue`.
    */
  def build(g: CompactGraph, truss: Array[Int]): TrussTree = {
    val builder = new Builder(g, truss)
    val top = (0 until g.m).filter(truss(_) != Int.MaxValue).toArray
    val nodeOf = Array.fill(g.m)(-1)
    val nodes = builder.buildInto(top, -1, nodeOf)
    new TrussTree(nodes, nodeOf)
  }

  /** Rebuild only the top-level components containing `dirty` edges; every
    * other node (and its id) is carried over from `prev` unchanged.
    * Equivalent to `build(g, truss)` — asserted by property tests.
    */
  def rebuild(g: CompactGraph, truss: Array[Int], prev: TrussTree,
              dirty: Iterable[Int]): TrussTree = {
    val affectedRoots = dirty.map(prev.rootOf).filter(_ != -1).toSet
    if (affectedRoots.isEmpty) return prev
    val affectedEdges = affectedRoots.iterator.flatMap(prev.subtreeEdges).toArray
    val keepNodes = prev.nodes.filter { case (id, _) =>
      !affectedRoots.contains(prevRootOfNode(prev, id))
    }
    val nodeOf = prev.nodeOf.clone()
    affectedEdges.foreach(nodeOf(_) = -1)
    val builder = new Builder(g, truss)
    val subset = affectedEdges.filter(truss(_) != Int.MaxValue)
    val rebuilt = builder.buildInto(subset, -1, nodeOf)
    new TrussTree(keepNodes ++ rebuilt, nodeOf)
  }

  private def prevRootOfNode(prev: TrussTree, id: Int): Int = {
    var cur = id
    while (prev.nodes(cur).parent != -1) cur = prev.nodes(cur).parent
    cur
  }

  /** Recursive component peeling shared by build and rebuild. */
  private final class Builder(g: CompactGraph, truss: Array[Int]) {
    private val inCur = new Array[Boolean](g.m)
    private val uf = new Array[Int](g.m)
    private val anchorIds = (0 until g.m).filter(truss(_) == Int.MaxValue).toArray

    private def find(e: Int): Int = {
      var r = e
      while (uf(r) != r) r = uf(r)
      var c = e
      while (uf(c) != r) { val nxt = uf(c); uf(c) = r; c = nxt }
      r
    }
    private def union(a: Int, b: Int): Unit = {
      val ra = find(a); val rb = find(b)
      if (ra != rb) uf(if (ra < rb) rb else ra) = if (ra < rb) ra else rb
    }

    /** Partition `subset ∪ anchors` into triangle-connected groups; return
      * the groups of non-anchor edges.
      */
    private def components(subset: Array[Int]): Iterable[Array[Int]] = {
      val all = subset ++ anchorIds
      all.foreach { e => inCur(e) = true; uf(e) = e }
      all.foreach { e =>
        g.foreachTriangle(e) { (a, b) =>
          if (inCur(a) && inCur(b)) { union(e, a); union(e, b) }
        }
      }
      val groups = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Int]]
      subset.foreach(e => groups.getOrElseUpdate(find(e), mutable.ArrayBuffer.empty) += e)
      all.foreach(e => inCur(e) = false)
      groups.values.map(_.toArray)
    }

    /** Peel `subset` (Algorithm 4) attaching to `parent`; fills `nodeOf`
      * and returns the created nodes.
      */
    def buildInto(subset: Array[Int], parent: Int, nodeOf: Array[Int]): Map[Int, Node] = {
      val out = mutable.HashMap.empty[Int, (Int, Array[Int], Int, mutable.ArrayBuffer[Int])]
      def go(sub: Array[Int], par: Int): Unit = {
        for (comp <- components(sub)) {
          var kMin = Int.MaxValue
          comp.foreach(e => if (truss(e) < kMin) kMin = truss(e))
          val (hull, rest) = comp.partition(truss(_) == kMin)
          val id = hull.min
          out(id) = (kMin, hull, par, mutable.ArrayBuffer.empty)
          hull.foreach(nodeOf(_) = id)
          if (par != -1 && out.contains(par)) out(par)._4 += id
          if (rest.nonEmpty) go(rest, id)
        }
      }
      if (subset.nonEmpty) go(subset, parent)
      out.iterator.map { case (id, (k, edges, par, children)) =>
        id -> Node(id, k, edges, par, children.toArray)
      }.toMap
    }
  }

  /** Subtree-adjacency node ids (paper's `sla(e)`): the tree nodes of all
    * neighbor-edges `e'` of `e` with `t(e') >= t(e)`. Anchored neighbor
    * edges have no node and are skipped (their support effect is not a
    * reuse unit). Returns sorted distinct ids; -1 entries never appear.
    */
  def sla(g: CompactGraph, truss: Array[Int], nodeOf: Array[Int], e: Int): Array[Int] = {
    val te = truss(e)
    val out = mutable.SortedSet.empty[Int]
    g.foreachTriangle(e) { (a, b) =>
      if (truss(a) >= te && truss(a) != Int.MaxValue) out += nodeOf(a)
      if (truss(b) >= te && truss(b) != Int.MaxValue) out += nodeOf(b)
    }
    out.toArray
  }
}
