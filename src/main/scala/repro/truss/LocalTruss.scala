package repro.truss

import repro.graph.CompactGraph

/** Exact truss decomposition kernel (paper's Algorithm 1) with two
  * extensions the paper relies on:
  *
  *  - **layers**: within each k-hull the peel proceeds in sweeps; `layer(e)`
  *    is the 1-based sweep index in which `e` was removed (the paper's
  *    `l(e)`, Section III-B). A sweep removes every edge whose support was
  *    ≤ k-2 at sweep start; support updates within the sweep feed the *next*
  *    sweep.
  *  - **anchors**: anchored edges have `sup = +∞` conceptually — they are
  *    never removed, keep providing triangles at every phase, and receive
  *    `truss = Int.MaxValue`, `layer = 0` in the output.
  *
  * This kernel runs on the driver and inside Spark tasks (over a broadcast
  * [[CompactGraph]]); the distributed DataFrame formulation is
  * [[SparkTruss]] and is cross-validated against this one.
  */
object LocalTruss {

  /** `truss(e)` / `layer(e)` per edge; `kMax` = max trussness over
    * non-anchored edges (2 for a triangle-free graph).
    */
  final case class Result(truss: Array[Int], layer: Array[Int], kMax: Int)

  val AnchorTruss: Int = Int.MaxValue

  /** Decompose `g`; edges whose id is in `anchors` are never removed. */
  def decompose(g: CompactGraph, anchors: Array[Boolean] = null): Result = {
    val m = g.m
    val anch = if (anchors == null) new Array[Boolean](m) else anchors
    val sup = new Array[Int](m)
    val alive = new Array[Boolean](m)
    val truss = new Array[Int](m)
    val layer = new Array[Int](m)
    var e = 0
    var aliveNonAnchor = 0
    while (e < m) {
      sup(e) = g.support(e)
      alive(e) = true
      if (!anch(e)) aliveNonAnchor += 1
      e += 1
    }
    var kMax = 2
    var k = 2
    // scheduled(e): e is already queued for removal in the current or next
    // sweep, to avoid duplicates in the frontier buffers.
    val scheduled = new Array[Boolean](m)
    val frontier = new java.util.ArrayDeque[Int]()
    val next = new java.util.ArrayDeque[Int]()
    while (aliveNonAnchor > 0) {
      // seed the phase-k frontier with a full scan (once per phase)
      var i = 0
      while (i < m) {
        if (alive(i) && !anch(i) && sup(i) <= k - 2 && !scheduled(i)) {
          frontier.add(i); scheduled(i) = true
        }
        i += 1
      }
      var sweep = 0
      while (!frontier.isEmpty) {
        sweep += 1
        while (!frontier.isEmpty) {
          val x = frontier.poll()
          // remove x: record trussness/layer, cascade support decrements
          truss(x) = k
          layer(x) = sweep
          alive(x) = false
          aliveNonAnchor -= 1
          if (k > kMax) kMax = k
          g.foreachTriangle(x) { (e1, e2) =>
            if (alive(e1) && alive(e2)) {
              sup(e1) -= 1
              sup(e2) -= 1
              if (!anch(e1) && sup(e1) <= k - 2 && !scheduled(e1)) { next.add(e1); scheduled(e1) = true }
              if (!anch(e2) && sup(e2) <= k - 2 && !scheduled(e2)) { next.add(e2); scheduled(e2) = true }
            }
          }
        }
        // edges that dropped during this sweep form the next sweep
        while (!next.isEmpty) frontier.add(next.poll())
      }
      k += 1
    }
    e = 0
    while (e < m) {
      if (anch(e)) { truss(e) = AnchorTruss; layer(e) = 0 }
      e += 1
    }
    Result(truss, layer, kMax)
  }

  /** Trussness gain of anchoring `anchors` relative to the base decomposition
    * `base` (paper's Definition 4): Σ over non-anchored edges of the
    * trussness increment.
    */
  def trussGain(g: CompactGraph, base: Result, anchors: Array[Boolean]): Long = {
    val after = decompose(g, anchors)
    var gain = 0L
    var e = 0
    while (e < g.m) {
      if (!anchors(e)) gain += (after.truss(e) - base.truss(e)).toLong
      e += 1
    }
    gain
  }

  /** Convenience: anchor-set from edge ids. */
  def anchorMask(m: Int, ids: Iterable[Int]): Array[Boolean] = {
    val a = new Array[Boolean](m)
    ids.foreach(a(_) = true)
    a
  }
}
