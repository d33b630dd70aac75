package repro.core

import scala.collection.mutable
import repro.eval.Instrument
import repro.graph.LocalGraph

/** Algorithm 8: index-based local exploration (the paper's L2P-BCC).
  *
  * Instead of peeling the whole graph, it (1) extracts a shortest path
  * between the queries under the butterfly-core path weight (Def. 6), (2)
  * expands the path into a small candidate `G_t` by BFS over vertices whose
  * indexed coreness is at least the path minimum on each side, capped at
  * `eta` vertices, and (3) runs the LP-BCC refinement (Algorithms 5-7 +
  * bulk deletion) inside `G_t`. No 2-approximation guarantee, but fast and
  * high quality in practice (paper Exp-1/2).
  */
object L2PBCC {

  /** Default candidate-size cap (paper's empirically tuned eta). */
  val DefaultEta = 1000

  /** Dijkstra under an additive surrogate of the butterfly-core path weight:
    * stepping onto vertex v costs
    * `1 + gamma1 * (deltaMax - delta(v)) / deltaMax + gamma2 * (chiMax - chi(v)) / chiMax`,
    * so short paths through high-coreness / high-butterfly vertices win —
    * the stated intent of Def. 6 (the paper's path weight penalizes the
    * path-minimum shortfall; an additive per-vertex shortfall is the
    * standard shortest-path-computable surrogate).
    */
  private[core] def weightedPath(
      g: LocalGraph,
      src: Int,
      dst: Int,
      delta: Array[Int],
      chi: Array[Long],
      gamma1: Double,
      gamma2: Double): Option[List[Int]] = {
    val deltaMax = math.max(1, delta.max)
    val chiMax = math.max(1L, if (chi.isEmpty) 1L else chi.max).toDouble
    def cost(v: Int): Double =
      1.0 + gamma1 * (deltaMax - delta(v)).toDouble / deltaMax +
        gamma2 * (chiMax - chi(v)) / chiMax
    val dist = Array.fill(g.n)(Double.PositiveInfinity)
    val prev = Array.fill(g.n)(-1)
    val pq = mutable.PriorityQueue.empty[(Double, Int)](Ordering.by(-_._1))
    dist(src) = 0.0
    pq.enqueue((0.0, src))
    while (pq.nonEmpty) {
      val (d, u) = pq.dequeue()
      if (d <= dist(u)) {
        for (w <- g.neighbors(u)) {
          val nd = d + cost(w)
          if (nd < dist(w)) { dist(w) = nd; prev(w) = u; pq.enqueue((nd, w)) }
        }
      }
    }
    if (dist(dst).isInfinity) None
    else {
      var path = List(dst)
      while (path.head != src) path = prev(path.head) :: path
      Some(path)
    }
  }

  /** Expand the path into a candidate of at most ~eta vertices: BFS adding
    * adjacent same-pair-label vertices with indexed coreness >= the path
    * minimum of their side.
    */
  private[core] def expand(
      g: LocalGraph,
      path: List[Int],
      lLab: String,
      rLab: String,
      index: BCIndex,
      eta: Int): Array[Boolean] = {
    val kl = path.filter(v => g.labels(v) == lLab).map(index.coreness).minOption.getOrElse(0)
    val kr = path.filter(v => g.labels(v) == rLab).map(index.coreness).minOption.getOrElse(0)
    def admissible(v: Int): Boolean =
      (g.labels(v) == lLab && index.coreness(v) >= kl) ||
        (g.labels(v) == rLab && index.coreness(v) >= kr)
    val in = Array.fill(g.n)(false)
    val queue = new java.util.ArrayDeque[Int]()
    var count = 0
    for (v <- path if !in(v)) { in(v) = true; count += 1; queue.add(v) }
    while (!queue.isEmpty && count <= eta) {
      val u = queue.poll()
      for (w <- g.neighbors(u) if !in(w) && admissible(w)) {
        in(w) = true; count += 1; queue.add(w)
      }
    }
    in
  }

  /** Full L2P-BCC search. `index` may be shared across queries (that is the
    * point of the offline index); gamma1/gamma2 default to the paper's 0.5.
    */
  def run(
      g: LocalGraph,
      qlId: Long,
      qrId: Long,
      params: BCCParams,
      index: BCIndex,
      inst: Instrument = new Instrument,
      eta: Int = DefaultEta,
      gamma1: Double = 0.5,
      gamma2: Double = 0.5,
      computeDiameter: Boolean = true): Option[BCCResult] = inst.timeTotal {
    val ql = g.indexOf.getOrElse(qlId, return None)
    val qr = g.indexOf.getOrElse(qrId, return None)
    if (g.labels(ql) == g.labels(qr)) return None
    val lLab = g.labels(ql)
    val rLab = g.labels(qr)
    val chi = index.butterflyDegrees(lLab, rLab)

    val path = weightedPath(g, ql, qr, index.coreness, chi, gamma1, gamma2)
      .getOrElse(return None)

    // grow eta if the capped candidate cannot support the parameters
    var curEta = eta
    var result: Option[BCCResult] = None
    var attempts = 0
    while (result.isEmpty && attempts < 3) {
      attempts += 1
      val mask = expand(g, path, lLab, rLab, index, curEta)
      val cand = g.induced(mask)
      result = LocalBCC.findG0(cand, qlId, qrId, params, inst).flatMap { c =>
        val e = new BCCEngine(c.g0, params, c.ql, c.qr, inst)
        e.seedChi(c.chi)
        Refine.run(e, Refine.FastLP, computeDiameter)
      }
      curEta *= 4
    }
    // last resort: whole-graph LP-BCC (keeps quality comparable when the
    // local neighborhood cannot support the requested cores)
    result.orElse {
      LocalBCC.findG0(g, qlId, qrId, params, inst).flatMap { c =>
        val e = new BCCEngine(c.g0, params, c.ql, c.qr, inst)
        e.seedChi(c.chi)
        Refine.run(e, Refine.FastLP, computeDiameter)
      }
    }
  }
}
