package repro.baseline

import repro.eval.Instrument
import repro.graph.LocalGraph

/** Baseline: Progressive minimum k-core Search Algorithm (Li et al., PVLDB
  * 2019 — the paper's PSA competitor). Label-blind.
  *
  * Finds a *small* connected k-core containing the query vertices by
  * progressive expansion: grow a candidate around the queries in BFS order
  * (restricted to vertices whose global coreness can support k), doubling
  * the candidate size until it contains a connected k-core with the
  * queries; then shrink it with the same farthest-vertex greedy peeling.
  */
object PSA {

  private val Inf = LocalGraph.Inf

  /** Full PSA search. `k` defaults to the minimum coreness of the queries
    * (the same auto-parameter policy the BCC methods use).
    */
  def run(
      g: LocalGraph,
      queryIds: Seq[Long],
      k: Int = -1,
      inst: Instrument = new Instrument): Option[Set[Long]] = inst.timeTotal {
    val qs = queryIds.map(id => g.indexOf.getOrElse(id, return None))
    val coreness = g.coreness()
    val kk = if (k > 0) k else math.max(1, qs.map(coreness).min)
    if (qs.exists(coreness(_) < kk)) return None

    // vertices ordered by BFS distance from the query set
    val dist = g.bfs(qs)
    val candidates = (0 until g.n)
      .filter(v => dist(v) != Inf && coreness(v) >= kk)
      .sortBy(dist(_))

    // progressive doubling until a connected k-core contains all queries
    var size = math.min(candidates.length, math.max(qs.size * 4, 16))
    if (size == 0) return None
    var found: Option[Array[Boolean]] = None
    while (found.isEmpty && size <= candidates.length * 2) {
      val mask = Array.fill(g.n)(false)
      candidates.take(size).foreach(mask(_) = true)
      val core = g.kCoreMask(kk, mask)
      if (qs.forall(core)) {
        val comp = g.componentOf(qs.head, core)
        if (qs.forall(comp)) found = Some(comp)
      }
      size *= 2
    }
    val start = found.getOrElse(return None)

    // shrink: greedy farthest-vertex peeling with k-core maintenance
    val alive = start.clone()
    val deg = Array.tabulate(g.n)(v => if (alive(v)) g.neighbors(v).count(alive) else 0)
    def cascade(seeds: Seq[Int]): Boolean = {
      val queue = new java.util.ArrayDeque[Int]()
      seeds.foreach(queue.add(_))
      while (!queue.isEmpty) {
        val v = queue.poll()
        if (alive(v)) {
          if (qs.contains(v)) return false
          alive(v) = false
          for (u <- g.neighbors(v) if alive(u)) {
            deg(u) -= 1
            if (deg(u) < kk) queue.add(u)
          }
        }
      }
      true
    }

    var bestMask = alive.clone()
    var bestQd = Inf
    var go = true
    while (go) {
      inst.rounds += 1
      val dists = qs.map(q => g.bfs(Seq(q), alive))
      var maxQd = 0
      val qd = Array.fill(g.n)(-1)
      for (v <- 0 until g.n if alive(v)) {
        var d = 0
        for (ds <- dists) d = if (d == Inf || ds(v) == Inf) Inf else math.max(d, ds(v))
        qd(v) = d
        if (d == Inf) maxQd = Inf else if (maxQd != Inf) maxQd = math.max(maxQd, d)
      }
      if (maxQd != Inf && maxQd < bestQd) { bestMask = alive.clone(); bestQd = maxQd }
      val batch = (0 until g.n).filter(v => alive(v) && qd(v) == maxQd)
      if (batch.isEmpty || batch.exists(qs.contains(_))) go = false
      else if (!cascade(batch)) go = false
    }
    Some((0 until g.n).filter(bestMask).map(g.ids).toSet)
  }
}
