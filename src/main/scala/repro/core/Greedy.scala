package repro.core

import org.apache.spark.sql.SparkSession
import repro.graph.CompactGraph
import repro.truss.LocalTruss
import scala.collection.mutable

/** The greedy framework of the paper in its three incarnations:
  *
  *  - [[base]]   — Algorithm 2: every candidate's trussness gain via a full
  *                 anchored truss decomposition, every round. O(b·m^2.5).
  *  - [[basePlus]] — BASE with Algorithm 3: per-candidate upward-route +
  *                 support-check follower computation.
  *  - [[gas]]    — Algorithm 6: BASE+ plus the truss-component tree and
  *                 cross-round result reuse of Algorithms 4-5.
  *
  * All three share one deterministic tie-break (max gain, then smallest edge
  * id), so their anchor sequences are comparable edge-for-edge; property
  * tests assert GAS ≡ BASE+ ≡ BASE.
  *
  * The per-round candidate sweep (`for each e ∈ E\A`) is the bulk-parallel
  * part: candidates are shipped as a `Dataset` and evaluated in
  * `mapPartitions` tasks over a broadcast [[CompactGraph]] with per-round
  * broadcast trussness/layer arrays; the driver keeps only the greedy
  * selection and (for GAS) the tree/reuse bookkeeping.
  */
object Greedy {

  /** Per-round bookkeeping: candidates evaluated on Spark vs fully reused
    * from the cache (GAS), and the round's marginal gain.
    */
  final case class RoundStats(round: Int, anchor: Int, marginalGain: Long,
                              evaluated: Int, reusedFully: Int, millis: Long)

  /** `gain` is the exact final TG(A, G) (Definition 4), measured by one
    * anchored decomposition against the untouched graph — the telescoped
    * per-round follower counts can overstate it when a chosen anchor had
    * itself gained trussness from earlier anchors (it leaves the E\A sum).
    */
  final case class Result(anchors: Seq[Int], gain: Long, rounds: Seq[RoundStats]) {
    def totalEvaluations: Long = rounds.map(_.evaluated.toLong).sum
  }

  /** Exact TG(A, G) for a finished anchor mask. */
  private def finalGain(g: CompactGraph, anchors: Array[Boolean]): Long =
    LocalTruss.trussGain(g, LocalTruss.decompose(g), anchors)

  // ---------------------------------------------------------------- BASE

  /** Algorithm 2: full truss decomposition per candidate per round. */
  def base(spark: SparkSession, g: CompactGraph, b: Int): Result = {
    import spark.implicits._
    val sc = spark.sparkContext
    val gB = sc.broadcast(g)
    val anchors = new Array[Boolean](g.m)
    val picked = mutable.ArrayBuffer.empty[Int]
    val rounds = mutable.ArrayBuffer.empty[RoundStats]
    var gain = 0L
    for (round <- 1 to math.min(b, g.m)) {
      val t0 = System.nanoTime()
      val curDec = LocalTruss.decompose(g, anchors)
      val curB = sc.broadcast(curDec)
      val anchorsB = sc.broadcast(anchors.clone())
      val candidates = (0 until g.m).filter(!anchors(_))
      val gains = spark.createDataset(candidates)
        .repartition(sc.defaultParallelism)
        .mapPartitions { it =>
          val graph = gB.value
          val baseDec = curB.value
          it.map { e =>
            val mask = anchorsB.value.clone(); mask(e) = true
            (e, LocalTruss.trussGain(graph, baseDec, mask))
          }
        }
        .collect()
      val (bestE, bestGain) = gains.minBy { case (e, gl) => (-gl, e) }
      anchors(bestE) = true
      picked += bestE
      gain += bestGain
      rounds += RoundStats(round, bestE, bestGain, candidates.size, 0,
                           (System.nanoTime() - t0) / 1000000)
      curB.destroy(); anchorsB.destroy()
    }
    Result(picked.toSeq, finalGain(g, anchors), rounds.toSeq)
  }

  // --------------------------------------------------------------- BASE+

  /** BASE with upward-route/support-check follower computation (Alg. 3). */
  def basePlus(spark: SparkSession, g: CompactGraph, b: Int): Result = {
    import spark.implicits._
    val sc = spark.sparkContext
    val gB = sc.broadcast(g)
    val anchors = new Array[Boolean](g.m)
    val picked = mutable.ArrayBuffer.empty[Int]
    val rounds = mutable.ArrayBuffer.empty[RoundStats]
    var gain = 0L
    for (round <- 1 to math.min(b, g.m)) {
      val t0 = System.nanoTime()
      val dec = LocalTruss.decompose(g, anchors)
      val trussB = sc.broadcast(dec.truss)
      val layerB = sc.broadcast(dec.layer)
      val candidates = (0 until g.m).filter(!anchors(_))
      val counts = spark.createDataset(candidates)
        .repartition(sc.defaultParallelism)
        .mapPartitions { it =>
          val finder = new FollowerFinder(gB.value)
          val t = trussB.value; val l = layerB.value
          it.map(e => (e, finder.find(t, l, e).count))
        }
        .collect()
      val (bestE, bestGain) = counts.minBy { case (e, c) => (-c, e) }
      anchors(bestE) = true
      picked += bestE
      gain += bestGain
      rounds += RoundStats(round, bestE, bestGain, candidates.size, 0,
                           (System.nanoTime() - t0) / 1000000)
      trussB.destroy(); layerB.destroy()
    }
    Result(picked.toSeq, finalGain(g, anchors), rounds.toSeq)
  }

  // ----------------------------------------------------------------- GAS

  /** Algorithm 6: greedy with tree-based cross-round result reuse. */
  def gas(spark: SparkSession, g: CompactGraph, b: Int): Result = {
    import spark.implicits._
    val sc = spark.sparkContext
    val gB = sc.broadcast(g)
    val anchors = new Array[Boolean](g.m)
    val picked = mutable.ArrayBuffer.empty[Int]
    val rounds = mutable.ArrayBuffer.empty[RoundStats]
    var gain = 0L

    var state = FollowerReuse.initial(g, anchors)
    // cache(e): node id -> follower count of e within that node; null when
    // the whole entry must be recomputed (round 1 or invalidated edge)
    val cache = new Array[mutable.HashMap[Int, Int]](g.m)
    var staleNodes: Set[Int] = Set.empty // nodes invalidated by last anchor

    for (round <- 1 to math.min(b, g.m)) {
      val t0 = System.nanoTime()
      val candidates = (0 until g.m).filter(!anchors(_))
      // split candidates into fully-reusable (driver sum) and stale (Spark)
      val toCompute = mutable.ArrayBuffer.empty[(Int, Array[Int])] // (e, staleIds or null=full)
      val totals = new Array[Long](g.m)
      var reusedFully = 0
      candidates.foreach { e =>
        val c = cache(e)
        if (round == 1 || c == null) toCompute += ((e, null))
        else {
          val staleIds = state.sla(e).filter(id => staleNodes.contains(id) || !c.contains(id))
          if (staleIds.isEmpty) {
            totals(e) = state.sla(e).iterator.map(id => c(id).toLong).sum
            reusedFully += 1
          } else toCompute += ((e, staleIds))
        }
      }
      if (toCompute.nonEmpty) {
        val trussB = sc.broadcast(state.truss)
        val layerB = sc.broadcast(state.layer)
        val nodeOfB = sc.broadcast(state.tree.nodeOf)
        val fresh = spark.createDataset(toCompute.toSeq)
          .repartition(sc.defaultParallelism)
          .mapPartitions { it =>
            val finder = new FollowerFinder(gB.value)
            val t = trussB.value; val l = layerB.value; val nodeOf = nodeOfB.value
            it.map { case (e, staleIds) =>
              val allow: Int => Boolean =
                if (staleIds == null) null
                else { val s = staleIds.toSet; s.contains }
              val r = finder.find(t, l, e, nodeOf, allow)
              (e, r.perNode.toSeq)
            }
          }
          .collect()
        val staleOf = toCompute.iterator.map { case (e, ids) => e -> ids }.toMap
        fresh.foreach { case (e, perNode) =>
          val freshMap = perNode.toMap
          val old = cache(e)
          val merged = mutable.HashMap.empty[Int, Int]
          val staleIds = staleOf(e)
          state.sla(e).foreach { id =>
            val stale = staleIds == null || staleIds.contains(id)
            merged(id) = if (stale) freshMap.getOrElse(id, 0)
                         else old(id)
          }
          cache(e) = merged
          totals(e) = merged.valuesIterator.map(_.toLong).sum
        }
        trussB.destroy(); layerB.destroy(); nodeOfB.destroy()
      }
      val bestE = candidates.minBy(e => (-totals(e), e))
      val bestGain = totals(bestE)
      anchors(bestE) = true
      picked += bestE
      gain += bestGain
      // refresh the tree/decomposition and invalidation info (Algorithm 5)
      val refresh = FollowerReuse.refresh(g, state, bestE, anchors)
      state = refresh.state
      staleNodes = refresh.staleNodes
      refresh.invalidatedEdges.foreach(e => cache(e) = null)
      cache(bestE) = null
      rounds += RoundStats(round, bestE, bestGain, toCompute.size, reusedFully,
                           (System.nanoTime() - t0) / 1000000)
    }
    Result(picked.toSeq, finalGain(g, anchors), rounds.toSeq)
  }

  /** Route sizes of every edge in round one (Table IV / the Tur baseline):
    * computed Spark-parallel over the broadcast graph.
    */
  def routeSizes(spark: SparkSession, g: CompactGraph): Array[Int] = {
    import spark.implicits._
    val sc = spark.sparkContext
    val gB = sc.broadcast(g)
    val dec = LocalTruss.decompose(g)
    val trussB = sc.broadcast(dec.truss)
    val layerB = sc.broadcast(dec.layer)
    val res = spark.createDataset(0 until g.m)
      .repartition(sc.defaultParallelism)
      .mapPartitions { it =>
        val finder = new FollowerFinder(gB.value)
        val t = trussB.value; val l = layerB.value
        it.map(e => (e, finder.find(t, l, e).routeSize))
      }
      .collect()
    val out = new Array[Int](g.m)
    res.foreach { case (e, s) => out(e) = s }
    out
  }
}
