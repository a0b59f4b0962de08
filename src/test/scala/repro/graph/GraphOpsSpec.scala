package repro.graph

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}

/** DataFrame graph primitives against the DuckDB oracle: triangle counting
  * and per-edge support are plain SQL over the same edge table, so a wrong
  * Catalyst join produces a row-level diff, not a green "it ran".
  */
class GraphOpsSpec extends SparkSpec {

  private def edgeDf(g: CompactGraph) = CompactGraph.toDataFrame(g, spark)

  test("canonicalEdges: dedup, orientation, dense deterministic ids") {
    import spark.implicits._
    val raw = Seq((3, 1), (1, 3), (2, 2), (0, 1), (1, 0), (1, 2))
      .toDF("src", "dst")
    val canon = GraphOps.canonicalEdges(raw).collect().sortBy(_.getInt(0))
    assert(canon.map(r => (r.getInt(1), r.getInt(2))).toSeq ==
      Seq((0, 1), (1, 2), (1, 3)))
    assert(canon.map(_.getInt(0)).toSeq == Seq(0, 1, 2))
  }

  test("canonical ids match CompactGraph ids") {
    for (seed <- 1 to 3) {
      val g = TestGraphs.random(15, 60, seed * 41)
      import spark.implicits._
      val raw = (0 until g.m).map(e => (g.edgeV(e), g.edgeU(e))).toDF("src", "dst")
      val canon = GraphOps.canonicalEdges(raw).collect()
      canon.foreach { r =>
        val id = r.getInt(0)
        assert((g.edgeU(id), g.edgeV(id)) == (r.getInt(1), r.getInt(2)))
      }
    }
  }

  test("degrees agree with DuckDB") {
    val g = TestGraphs.random(14, 50, 7)
    val edges = edgeDf(g)
    val got = GraphOps.degrees(edges)
      .select(col("v").cast("string").as("v"), col("degree"))
    Oracle.assertEquivalent(got,
      """SELECT v, count(*) AS degree FROM (
        |  SELECT src AS v FROM edges UNION ALL SELECT dst AS v FROM edges
        |) GROUP BY v""".stripMargin,
      "edges" -> edges)
  }

  test("triangle enumeration agrees with DuckDB") {
    for (seed <- Seq(3, 9)) {
      val g = TestGraphs.random(13, 45, seed)
      val edges = edgeDf(g)
      val got = GraphOps.triangles(edges)
        .select(col("a").cast("string").as("a"), col("b").cast("string").as("b"),
                col("c").cast("string").as("c"))
      Oracle.assertEquivalent(got,
        """SELECT e1.src AS a, e1.dst AS b, e2.dst AS c
          |FROM edges e1
          |JOIN edges e2 ON e1.dst = e2.src
          |JOIN edges e3 ON e1.src = e3.src AND e2.dst = e3.dst""".stripMargin,
        "edges" -> edges)
    }
  }

  test("per-edge support agrees with DuckDB") {
    for (seed <- Seq(5, 11)) {
      val g = TestGraphs.random(13, 45, seed)
      val edges = edgeDf(g)
      val got = GraphOps.support(edges)
        .select(col("src").cast("string").as("src"),
                col("dst").cast("string").as("dst"), col("support"))
      Oracle.assertEquivalent(got,
        """SELECT e.src AS src, e.dst AS dst, count(t.a) AS support
          |FROM edges e
          |LEFT JOIN (
          |  SELECT e1.src AS a, e1.dst AS b, e2.dst AS c
          |  FROM edges e1
          |  JOIN edges e2 ON e1.dst = e2.src
          |  JOIN edges e3 ON e1.src = e3.src AND e2.dst = e3.dst
          |) t ON (e.src = t.a AND e.dst = t.b)
          |     OR (e.src = t.b AND e.dst = t.c)
          |     OR (e.src = t.a AND e.dst = t.c)
          |GROUP BY e.src, e.dst""".stripMargin,
        "edges" -> edges)
    }
  }

  test("support agrees with CompactGraph.support") {
    val g = TestGraphs.random(14, 55, 17)
    val sup = GraphOps.support(edgeDf(g)).collect()
      .map(r => r.getInt(0) -> r.getLong(3)).toMap
    for (e <- 0 until g.m) assert(sup(e) == g.support(e))
  }

  test("stats returns (vertices-with-an-edge, edges, max support)") {
    val g = TestGraphs.clique(5)
    val (v, e, s) = GraphOps.stats(spark, edgeDf(g))
    assert(v == 5 && e == 10 && s == 3)
  }
}
