package repro.core

import repro.{SparkSpec, TestGraphs}

/** Rand / Sup / Tur random baselines: determinism, valid pools, and the
  * structural relation to the greedy result (GAS is at least as good as the
  * best random draw it is compared against... not guaranteed in theory, but
  * the greedy's first pick alone matches the best single edge, so for b=1
  * GAS >= every baseline; we assert that exact case plus sanity for b>1).
  */
class BaselinesSpec extends SparkSpec {

  test("baselines are deterministic in the seed") {
    val g = TestGraphs.random(20, 90, 83)
    val a = Baselines.rand(spark, g, b = 3, trials = 8, seed = 5)
    val b = Baselines.rand(spark, g, b = 3, trials = 8, seed = 5)
    assert(a == b)
  }

  test("more trials can only improve the reported maximum") {
    val g = TestGraphs.random(20, 90, 89)
    val few = Baselines.rand(spark, g, b = 3, trials = 4, seed = 9)
    val many = Baselines.rand(spark, g, b = 3, trials = 12, seed = 9)
    assert(many >= few)
  }

  test("gains are non-negative on random graphs") {
    val g = TestGraphs.random(18, 70, 97)
    assert(Baselines.rand(spark, g, 3, 5) >= 0)
    assert(Baselines.sup(spark, g, 3, 5) >= 0)
    assert(Baselines.tur(spark, g, 3, 5) >= 0)
  }

  test("GAS b=1 beats or ties every baseline (greedy first pick is optimal)") {
    for (seed <- Seq(3, 7)) {
      val g = TestGraphs.random(16, 60, seed * 101)
      val gas = Greedy.gas(spark, g, 1).gain
      assert(gas >= Baselines.rand(spark, g, 1, 10, seed))
      assert(gas >= Baselines.sup(spark, g, 1, 10, seed))
      assert(gas >= Baselines.tur(spark, g, 1, 10, seed))
    }
  }

  test("clique graphs: all baselines report zero gain") {
    val g = TestGraphs.clique(6)
    assert(Baselines.rand(spark, g, 2, 5) == 0)
    assert(Baselines.sup(spark, g, 2, 5) == 0)
    assert(Baselines.tur(spark, g, 2, 5) == 0)
  }
}
