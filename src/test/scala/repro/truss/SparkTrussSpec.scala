package repro.truss

import repro.{SparkSpec, TestGraphs}
import repro.graph.CompactGraph

/** The distributed DataFrame decomposition must agree with the local exact
  * kernel — trussness *and* layers — including under anchors.
  */
class SparkTrussSpec extends SparkSpec {

  private def check(g: CompactGraph, anchors: Set[Int] = Set.empty): Unit = {
    val local = LocalTruss.decompose(g,
      if (anchors.isEmpty) null else LocalTruss.anchorMask(g.m, anchors))
    val df = CompactGraph.toDataFrame(g, spark)
    val rows = SparkTruss.decompose(spark, df, anchors).collect()
    assert(rows.length == g.m)
    rows.foreach { r =>
      val e = r.getInt(0); val t = r.getInt(1); val l = r.getInt(2)
      assert(t == local.truss(e), s"edge $e truss: spark=$t local=${local.truss(e)}")
      assert(l == local.layer(e), s"edge $e layer: spark=$l local=${local.layer(e)}")
    }
  }

  test("SparkTruss equals LocalTruss on a clique") {
    check(TestGraphs.clique(6))
  }

  test("SparkTruss equals LocalTruss on a triangle-free cycle") {
    check(TestGraphs.cycle(7))
  }

  test("SparkTruss equals LocalTruss on bowtie cliques") {
    check(TestGraphs.bowtieCliques(5))
  }

  test("SparkTruss equals LocalTruss on random graphs") {
    for (seed <- 1 to 4) check(TestGraphs.random(14, 45, seed * 23))
  }

  test("SparkTruss equals LocalTruss with anchored edges") {
    for (seed <- 1 to 3) {
      val g = TestGraphs.random(12, 40, seed * 29)
      check(g, Set(0, g.m / 2))
    }
  }
}
