package repro.core

import repro.eval.Instrument
import repro.graph.LocalGraph

/** Mutable working state for the candidate community `G0` during the
  * greedy refinement loop (paper Algorithm 1, maintenance Algorithm 4).
  *
  * Tracks per-vertex liveness, intra-label degrees (for O(1) cascade core
  * maintenance), and the last full butterfly count. Deletions cascade:
  * removing a vertex decrements its same-label neighbors' intra degrees and
  * peels any that drop below their side's `k` (Algorithm 4); an `onDelete`
  * hook fires before each removal so LP-BCC can run Algorithm 7 leader
  * updates against the still-current adjacency.
  */
final class BCCEngine(
    val g: LocalGraph,
    val params: BCCParams,
    val ql: Int,
    val qr: Int,
    val inst: Instrument) {

  require(g.labels(ql) != g.labels(qr), "query vertices must have different labels")

  val leftLabel: String = g.labels(ql)
  val rightLabel: String = g.labels(qr)
  val isLeft: Array[Boolean] = Array.tabulate(g.n)(v => g.labels(v) == leftLabel)
  val isRight: Array[Boolean] = Array.tabulate(g.n)(v => g.labels(v) == rightLabel)

  val alive: Array[Boolean] = Array.fill(g.n)(true)
  var aliveCount: Int = g.n

  /** Degree towards alive same-label neighbors (the per-side core degree). */
  val intraDeg: Array[Int] =
    Array.tabulate(g.n)(v => g.neighbors(v).count(u => g.labels(u) == g.labels(v)))

  /** Butterfly degrees from the last full count (Algorithm 3); entries for
    * leader vertices are kept exact between counts via Algorithm 7, others
    * may go stale until the next full count.
    */
  var chi: Array[Long] = Array.fill(g.n)(0L)

  /** True once `chi` holds a real count (seeded from Algorithm 2 or set by
    * [[fullButterflyCount]]).
    */
  var chiInitialized: Boolean = false

  /** Seed `chi` from a count already performed (e.g. Algorithm 2's). */
  def seedChi(values: Array[Long]): Unit = {
    require(values.length == g.n)
    chi = values.clone()
    chiInitialized = true
  }

  /** Core threshold of v's side. */
  def kOf(v: Int): Int = if (isLeft(v)) params.k1 else params.k2

  /** Full per-vertex butterfly recount over alive vertices (Algorithm 3). */
  def fullButterflyCount(): Unit = {
    inst.butterflyCountCalls += 1
    inst.timeButterflyCount {
      chi = g.butterflyDegrees(isLeft, isRight, alive)
    }
    chiInitialized = true
  }

  /** Max butterfly degree among alive vertices of one side. */
  def maxChi(left: Boolean): Long = {
    var best = 0L
    var v = 0
    while (v < g.n) {
      if (alive(v) && (if (left) isLeft(v) else isRight(v)) && chi(v) > best) best = chi(v)
      v += 1
    }
    best
  }

  /** Alive cross-label (bipartite) neighbors of `v`, sorted. */
  def crossNeighbors(v: Int): Array[Int] =
    g.neighbors(v).filter(u => alive(u) && isLeft(u) != isLeft(v))

  /** Size of the intersection of two sorted arrays. */
  private[core] def intersectSize(a: Array[Int], b: Array[Int]): Int = {
    var i = 0; var j = 0; var c = 0
    while (i < a.length && j < b.length) {
      if (a(i) == b(j)) { c += 1; i += 1; j += 1 }
      else if (a(i) < b(j)) i += 1
      else j += 1
    }
    c
  }

  /** Delete `seeds` and cascade core maintenance (Algorithm 4).
    *
    * @param onDelete fired for each vertex immediately *before* it is marked
    *                 dead (its adjacency is still current), in deletion order
    * @return vertices removed (in order), or None if a query vertex would be
    *         removed — the engine is then no longer a valid BCC and the
    *         caller must stop using it.
    */
  def deleteCascade(seeds: Seq[Int], onDelete: Int => Unit = _ => ()): Option[Seq[Int]] = {
    val queue = new java.util.ArrayDeque[Int]()
    seeds.foreach(queue.add(_))
    val removed = scala.collection.mutable.ArrayBuffer[Int]()
    while (!queue.isEmpty) {
      val v = queue.poll()
      if (alive(v)) {
        if (v == ql || v == qr) return None
        onDelete(v)
        alive(v) = false
        aliveCount -= 1
        removed += v
        for (u <- g.neighbors(v) if alive(u) && g.labels(u) == g.labels(v)) {
          intraDeg(u) -= 1
          if (intraDeg(u) < kOf(u)) queue.add(u)
        }
      }
    }
    Some(removed.toSeq)
  }

  /** External ids of the currently alive vertices. */
  def aliveIds: Set[Long] =
    (0 until g.n).iterator.filter(alive).map(g.ids).toSet
}
