package repro.bench

import repro.SparkSpec
import repro.graph.GraphGen

/** Table III (Exp-1): dataset statistics, trussness gain of Rand/Sup/Tur/GAS
  * and runtime of BASE/BASE+/GAS at the default budget, on all 8 stand-ins.
  *
  * Shape claims under test (the paper's conclusions):
  *  - GAS achieves the highest trussness gain on every dataset;
  *  - BASE is orders of magnitude slower than BASE+ and only feasible on
  *    the smallest dataset;
  *  - GAS reuses most results after round one (the source of its speedup
  *    over BASE+; the paper reports >80% fully reusable).
  */
class TableIIIBench extends SparkSpec {

  private val b = 20
  private val trials = 100

  test("Table III: effectiveness and efficiency on all stand-ins") {
    val rows = Harness.tableIII(spark, GraphGen.presets.map(_.name), b, trials)
    Harness.printIII(rows, b)

    rows.foreach { r =>
      assert(r.gas > r.rand, s"${r.name}: GAS ${r.gas} !> Rand ${r.rand}")
      assert(r.gas > r.sup, s"${r.name}: GAS ${r.gas} !> Sup ${r.sup}")
      assert(r.gas > r.tur, s"${r.name}: GAS ${r.gas} !> Tur ${r.tur}")
    }
    // BASE runs only on the college-scale stand-in, like the paper's "-"
    assert(rows.count(_.baseMs.isDefined) >= 1)
    rows.filter(_.baseMs.isDefined).foreach { r =>
      assert(r.baseMs.get > r.basePlusMs,
        s"${r.name}: BASE ${r.baseMs.get}ms should dwarf BASE+ ${r.basePlusMs}ms")
    }
    // reuse is the mechanism of GAS's speedup; it must be substantial
    val avgReuse = rows.map(_.reuseFrac).sum / rows.size
    info(f"average fully-reused fraction after round one: ${avgReuse * 100}%.0f%% (paper: >80%%)")
    assert(avgReuse > 0.3, f"avg reuse $avgReuse%.2f")
  }
}
