package repro.bench

import repro.SparkSpec
import repro.graph.GraphGen

/** Table V (Exp-9): AKT vertex anchoring vs GAS edge anchoring, trussness
  * gain ratio over all k. Shape claims: AKT captures only a fraction of
  * GAS's gain even at its best k (paper: 8-74% max, 5-51% avg), because it
  * reinforces a single trussness level while GAS spreads anchors across
  * levels; and avg over k is below the best-k value.
  */
class TableVBench extends SparkSpec {

  private val b = 50 // the paper's Table V budget

  test("Table V: AKT vs GAS trussness gain on all stand-ins") {
    val rows = Harness.tableV(spark, GraphGen.presets.map(_.name), b)
    Harness.printV(rows, b)

    rows.foreach { r =>
      assert(r.gasGain > 0, s"${r.name}: GAS gained nothing")
      assert(r.avgPct <= r.maxPct + 1e-9, s"${r.name}")
      // averaged over k, AKT must not reach GAS (the paper's headline claim)
      assert(r.avgPct < 100.0, s"${r.name}: AKT avg ${r.avgPct}%% reached GAS")
    }
    // at its single best k, AKT should lose on most datasets too; our
    // stand-ins are far shallower than the SNAP graphs (kmax 8-24 vs
    // 19-97), so a lone best-k win is tolerated and reported
    val maxWins = rows.count(_.maxPct < 100.0)
    info(s"datasets where GAS beats AKT even at AKT's best k: $maxWins/${rows.size} (paper: 8/8)")
    assert(maxWins >= rows.size / 2, s"only $maxWins datasets")
    val avgOfAvg = rows.map(_.avgPct).sum / rows.size
    info(f"mean avg-gain ratio across datasets: $avgOfAvg%.0f%% (paper: 5%%-51%%)")
    assert(avgOfAvg < 80, f"AKT mean ratio $avgOfAvg%.0f%% too close to GAS")
  }
}
