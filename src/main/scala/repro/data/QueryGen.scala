package repro.data

import scala.util.Random
import repro.graph.LocalGraph
import GraphGen.{Planted, PlantedMulti}

/** Query workload generation following the paper's protocol (§8): random
  * label-crossing pairs from ground-truth communities, with optional
  * degree-rank (`Q_d`) and inter-distance (`l`) constraints.
  */
object QueryGen {

  /** A 2-label BCC query with its ground-truth community. */
  final case class Query2(ql: Long, qr: Long, truth: Set[Long])

  /** A multi-label query (one vertex per label) with its ground truth. */
  final case class QueryM(qs: Seq[Long], truth: Set[Long])

  /** Degree threshold such that a vertex with degree >= threshold is in the
    * top (1 - pct) of the degree distribution (paper: Q_d = 80% means the
    * query's degree exceeds 80% of vertices).
    */
  def degreeThreshold(g: LocalGraph, pct: Double): Int = {
    if (g.n == 0) return 0
    val degs = (0 until g.n).map(g.degree).sorted
    degs(math.min(g.n - 1, (pct * g.n).toInt))
  }

  /** Sample `n` queries from planted communities. Each query picks a random
    * community and one vertex per labeled half; optional constraints are
    * enforced by rejection sampling with graceful relaxation.
    *
    * @param degRankPct if >= 0, both query degrees must be above this
    *                   percentile of the global degree distribution
    * @param interDist  if > 0, require dist(ql, qr) == interDist
    */
  def queries2(
      p: Planted,
      n: Int,
      seed: Long,
      degRankPct: Double = -1,
      interDist: Int = -1): Seq[Query2] = {
    val rnd = new Random(seed)
    val g = p.graph
    val thr = if (degRankPct >= 0) degreeThreshold(g, degRankPct) else 0
    val out = Seq.newBuilder[Query2]
    var produced = 0
    var attempts = 0
    val maxAttempts = n * 200
    while (produced < n && attempts < maxAttempts) {
      attempts += 1
      val c = p.communities(rnd.nextInt(p.communities.size))
      if (c.left.nonEmpty && c.right.nonEmpty) {
        val ql = c.left.toIndexedSeq(rnd.nextInt(c.left.size))
        val qr = c.right.toIndexedSeq(rnd.nextInt(c.right.size))
        val degOk = degRankPct < 0 ||
          (g.degree(g.indexOf(ql)) >= thr && g.degree(g.indexOf(qr)) >= thr)
        lazy val distOk = interDist <= 0 || {
          val d = g.bfs(Seq(g.indexOf(ql)))(g.indexOf(qr))
          d == interDist
        }
        if (degOk && distOk) {
          out += Query2(ql, qr, c.all)
          produced += 1
        }
      }
    }
    out.result()
  }

  /** Sample `n` multi-label queries with exactly `m` labels each from
    * projects spanning at least `m` teams.
    */
  def queriesM(p: PlantedMulti, m: Int, n: Int, seed: Long): Seq[QueryM] = {
    val rnd = new Random(seed)
    val eligible = p.communities.filter(_.groups.size >= m)
    if (eligible.isEmpty) return Nil
    val out = Seq.newBuilder[QueryM]
    for (_ <- 0 until n) {
      val c = eligible(rnd.nextInt(eligible.size))
      val teams = rnd.shuffle(c.groups.toList).take(m)
      val qs = teams.map { case (_, members) =>
        members.toIndexedSeq(rnd.nextInt(members.size))
      }
      out += QueryM(qs, teams.flatMap(_._2).toSet)
    }
    out.result()
  }
}
