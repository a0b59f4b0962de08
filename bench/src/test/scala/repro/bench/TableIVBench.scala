package repro.bench

import repro.SparkSpec
import repro.graph.GraphGen

/** Table IV (Exp-7): upward-route size statistics for every edge in the
  * first GAS round. The claim under test: routes are tiny relative to the
  * graph — the reason BASE+ beats BASE — with minimum 0 (edges with no
  * qualifying seed) and a small average.
  */
class TableIVBench extends SparkSpec {

  test("Table IV: upward-route sizes across all stand-ins") {
    val rows = Harness.tableIV(spark, GraphGen.presets.map(_.name))
    Harness.printIV(rows)

    rows.foreach { r =>
      assert(r.min == 0, s"${r.name}: some edges must have empty routes")
      val g = GraphGen.graph(r.name)
      assert(r.max < g.m / 2, s"${r.name}: max route ${r.max} not small vs m=${g.m}")
      assert(r.avg < 60, s"${r.name}: avg route ${r.avg} (paper range 0.63-14.55)")
    }
  }
}
