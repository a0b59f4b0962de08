package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.GraphGen

/** The bench harness's embedded paper numbers must stay consistent with
  * the dataset roster, and small harness runs must produce sane rows.
  */
class HarnessSpec extends AnyFunSuite {

  test("paper tables cover exactly the 8 stand-ins") {
    val names = GraphGen.presets.map(_.name).toSet
    assert(Harness.paperIII.keySet == names)
    assert(Harness.paperIV.keySet == names)
    assert(Harness.paperV.keySet == names)
  }

  test("paper Table III numbers match the publication rows spot-checked") {
    val college = Harness.paperIII("college")
    assert(college.vertices == 1899 && college.edges == 13838)
    assert(college.gas == 769 && college.baseS.contains(98547.74))
    val pokec = Harness.paperIII("pokec")
    assert(pokec.basePlusS.isEmpty) // "-" in the paper
    assert(pokec.gasS.contains(210571.13))
  }

  test("paper Table IV facebook row is the published outlier") {
    val fb = Harness.paperIV("facebook")
    assert(fb.avg == 14.55 && fb.max == 8629)
    assert(Harness.paperIV.values.map(_.avg).max == 14.55)
  }

  test("paper Table V ratios: facebook lowest, college highest") {
    val v = Harness.paperV
    assert(v.values.map(_.avgGainPct).min == v("facebook").avgGainPct)
    assert(v.values.map(_.avgGainPct).max == v("college").avgGainPct)
  }

  test("a harness run over a single dataset yields consistent rows") {
    val spark = repro.SparkSpec.shared
    val rows = Harness.tableIV(spark, Seq("college"))
    assert(rows.size == 1)
    val r = rows.head
    assert(r.min >= 0 && r.max >= r.min && r.avg >= 0)
    assert(math.abs(r.avg - r.sum.toDouble / GraphGen.graph("college").m) < 1e-9)
  }
}
