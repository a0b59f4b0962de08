package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.graph.CompactGraph
import repro.truss.LocalTruss

/** AKT vertex-anchoring baseline (Exp-9 comparison). */
class AKTSpec extends AnyFunSuite {

  test("clique: AKT finds nothing to anchor at any k (no k-1 hull below kMax)") {
    val g = TestGraphs.clique(5)
    for (k <- 3 to 5) {
      val r = AKT.run(g, k, b = 2)
      assert(r.globalGain == 0, s"k=$k gain=${r.globalGain}")
    }
  }

  test("K5 minus an edge: anchoring a vertex of the gap recovers the clique") {
    val all = for (i <- 0 until 5; j <- (i + 1) until 5) yield (i, j)
    val g = CompactGraph.fromEdges(all.filterNot(_ == (0, 1)))
    val base = LocalTruss.decompose(g)
    assert(base.kMax == 4)
    val r = AKT.run(g, k = 5, b = 1)
    // anchoring vertex 0 or 1 anchors its incident edges, lifting others
    assert(r.vertices.nonEmpty)
    assert(r.globalGain >= 0)
  }

  test("gain equals the exact count of (k-1)-hull edges pulled into the k-truss") {
    for (seed <- 1 to 6) {
      val g = TestGraphs.random(14, 50, seed * 103 + 9)
      val base = LocalTruss.decompose(g)
      for (k <- 3 to base.kMax) {
        val r = AKT.run(g, k, b = 2)
        val anchors = LocalTruss.anchorMask(g.m, r.anchoredEdges)
        val after = LocalTruss.decompose(g, anchors)
        val want = (0 until g.m).count { e =>
          !anchors(e) && base.truss(e) == k - 1 && after.truss(e) >= k
        }
        assert(r.globalGain == want, s"seed=$seed k=$k")
      }
    }
  }

  test("sweep covers k in [3, kMax]") {
    val g = TestGraphs.random(14, 50, 211)
    val kMax = LocalTruss.decompose(g).kMax
    val rs = AKT.sweep(g, b = 1)
    assert(rs.map(_.k) == (3 to kMax))
  }

  test("chosen vertices are endpoints of (k-1)-hull edges") {
    for (seed <- Seq(5, 9)) {
      val g = TestGraphs.random(14, 50, seed * 107)
      val dec = LocalTruss.decompose(g)
      for (k <- 3 to dec.kMax) {
        val r = AKT.run(g, k, b = 1)
        val hullVerts = (0 until g.m).filter(dec.truss(_) == k - 1)
          .flatMap(e => Seq(g.edgeU(e), g.edgeV(e))).toSet
        r.vertices.headOption.foreach(v => assert(hullVerts.contains(v)))
      }
    }
  }
}
