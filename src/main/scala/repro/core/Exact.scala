package repro.core

import org.apache.spark.sql.SparkSession
import repro.graph.CompactGraph
import repro.truss.LocalTruss

/** The Exact algorithm (Exp-2): exhaustively evaluate every b-subset of
  * edges and return the optimum trussness gain. Exponential — only usable
  * at the paper's Exp-2 scale (extracted subgraphs of 150-250 edges,
  * b ≤ 3). Subset evaluation is distributed: each Spark task scores a slice
  * of the combination space with exact anchored decompositions over the
  * broadcast graph.
  */
object Exact {

  final case class Result(anchors: Seq[Int], gain: Long, combosTried: Long)

  def run(spark: SparkSession, g: CompactGraph, b: Int): Result = {
    import spark.implicits._
    val sc = spark.sparkContext
    val gB = sc.broadcast(g)
    val base = LocalTruss.decompose(g)
    val baseB = sc.broadcast(base)
    val combos = (0 until g.m).combinations(b).map(_.toArray).toArray
    val scored = spark.createDataset(combos.toSeq)
      .repartition(sc.defaultParallelism)
      .mapPartitions { it =>
        val graph = gB.value
        val baseDec = baseB.value
        it.map { ids =>
          (ids, LocalTruss.trussGain(graph, baseDec, LocalTruss.anchorMask(graph.m, ids)))
        }
      }
      .collect()
    val (bestIds, bestGain) = scored.minBy { case (ids, gain) => (-gain, ids.toSeq.toString) }
    Result(bestIds.toSeq, bestGain, combos.length.toLong)
  }
}
