package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.truss.LocalTruss

/** The three greedy variants must be interchangeable: same anchor sequence,
  * same gain (they share one deterministic tie-break). This is the
  * end-to-end check that the upward-route computation (BASE+ vs BASE) and
  * the tree-reuse machinery (GAS vs BASE+) introduce no behavioural drift.
  */
class GreedySpec extends SparkSpec {

  test("BASE+ equals BASE (anchors and gain) on random graphs") {
    for (seed <- 1 to 4) {
      val g = TestGraphs.random(12, 40, seed * 53 + 2)
      val rb = Greedy.base(spark, g, 3)
      val rp = Greedy.basePlus(spark, g, 3)
      assert(rb.anchors == rp.anchors, s"seed=$seed base=${rb.anchors} basePlus=${rp.anchors}")
      assert(rb.gain == rp.gain)
    }
  }

  test("GAS equals BASE+ (anchors and gain) on random graphs") {
    for (seed <- 1 to 8) {
      val g = TestGraphs.random(13, 48, seed * 59 + 4)
      val rp = Greedy.basePlus(spark, g, 4)
      val rg = Greedy.gas(spark, g, 4)
      assert(rp.anchors == rg.anchors, s"seed=$seed basePlus=${rp.anchors} gas=${rg.anchors}")
      assert(rp.gain == rg.gain, s"seed=$seed")
    }
  }

  test("GAS per-round marginals match BASE+ marginals") {
    for (seed <- 1 to 4) {
      val g = TestGraphs.random(13, 48, seed * 61 + 6)
      val rp = Greedy.basePlus(spark, g, 4)
      val rg = Greedy.gas(spark, g, 4)
      assert(rp.rounds.map(_.marginalGain) == rg.rounds.map(_.marginalGain))
    }
  }

  test("reported gain equals the exact TG of the final anchor set") {
    for (seed <- 1 to 4) {
      val g = TestGraphs.random(13, 48, seed * 67 + 8)
      val rg = Greedy.gas(spark, g, 3)
      val base = LocalTruss.decompose(g)
      val mask = LocalTruss.anchorMask(g.m, rg.anchors)
      assert(rg.gain == LocalTruss.trussGain(g, base, mask))
    }
  }

  test("GAS reuses results after round one") {
    val g = TestGraphs.random(30, 150, 71)
    val rg = Greedy.gas(spark, g, 4)
    // round 1 computes everything; later rounds must reuse something
    assert(rg.rounds.head.evaluated == g.m)
    assert(rg.rounds.tail.exists(_.reusedFully > 0),
      rg.rounds.map(r => (r.evaluated, r.reusedFully)).toString)
    // evaluated + reused covers all candidates each round
    rg.rounds.zipWithIndex.foreach { case (r, i) =>
      assert(r.evaluated + r.reusedFully == g.m - i)
    }
  }

  test("greedy marginals are the follower counts of the chosen anchors") {
    val g = TestGraphs.random(14, 55, 73)
    val rg = Greedy.gas(spark, g, 3)
    val anchors = new Array[Boolean](g.m)
    val finder = new FollowerFinder(g)
    rg.rounds.foreach { r =>
      val dec = LocalTruss.decompose(g, anchors)
      val expect = finder.find(dec.truss, dec.layer, r.anchor).count
      assert(r.marginalGain == expect, s"round ${r.round}")
      anchors(r.anchor) = true
    }
  }

  test("route sizes are per-edge and non-negative; clique has all-zero routes") {
    val g = TestGraphs.clique(6)
    val routes = Greedy.routeSizes(spark, g)
    assert(routes.length == g.m)
    assert(routes.forall(_ == 0))
  }

  test("budget larger than the edge count terminates gracefully") {
    val g = TestGraphs.clique(4) // 6 edges
    val rg = Greedy.gas(spark, g, 10)
    assert(rg.anchors.size == g.m)
  }
}
