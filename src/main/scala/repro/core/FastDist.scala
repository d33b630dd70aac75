package repro.core

import repro.graph.LocalGraph

/** Algorithm 5: fast (partial) query-distance recomputation.
  *
  * After a deletion round only vertices whose old distance exceeds
  * `d_min = min over deleted v of dist(v, q)` can change (and only upward),
  * so the update BFS restarts from the surviving `d_min` frontier `S_s`
  * instead of from the query vertex.
  */
object FastDist {

  /** Update `dist` (distance-to-q) in place after `deleted` vertices were
    * removed. `alive` must already reflect the removal; `dist` must still
    * hold the pre-removal values (including for the deleted vertices).
    */
  def update(
      g: LocalGraph,
      alive: Array[Boolean],
      dist: Array[Int],
      deleted: Seq[Int]): Unit = {
    if (deleted.isEmpty) return
    var dMin = LocalGraph.Inf
    for (v <- deleted) if (dist(v) < dMin) dMin = dist(v)
    for (v <- deleted) dist(v) = LocalGraph.Inf
    if (dMin == LocalGraph.Inf) return // only unreachable vertices died

    // S_u: alive vertices with old dist > dMin -> unknown; S_s: == dMin
    val queue = new java.util.ArrayDeque[Int]()
    var v = 0
    while (v < g.n) {
      if (alive(v)) {
        if (dist(v) > dMin && dist(v) != LocalGraph.Inf) dist(v) = LocalGraph.Inf
        if (dist(v) == dMin) queue.add(v)
      }
      v += 1
    }
    while (!queue.isEmpty) {
      val u = queue.poll()
      val du = dist(u)
      for (w <- g.neighbors(u) if alive(w) && dist(w) == LocalGraph.Inf) {
        dist(w) = du + 1
        queue.add(w)
      }
    }
  }
}
