package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.graph.LocalGraph

/** Theorem 3 verified against brute force: on tiny graphs, enumerate every
  * vertex subset containing the queries, find the optimal (smallest
  * diameter) valid BCC, and check that the greedy answer is within a factor
  * of 2.
  */
class ApproxSpec extends AnyFunSuite {

  /** Optimal BCC diameter by exhaustive subset enumeration, or None.
    *
    * Follows the paper's Algorithm 2 semantics: each label side must be
    * connected within its own intra-label subgraph (lines 2-3 keep only the
    * query's component per side), so every admissible community is a
    * subgraph of the greedy algorithm's candidate G0 and Theorem 3 applies
    * verbatim.
    */
  private def bruteForceOptimal(
      g: LocalGraph,
      ql: Long,
      qr: Long,
      params: BCCParams): Option[Int] = {
    val others = g.ids.filterNot(id => id == ql || id == qr)
    require(others.length <= 14, "graph too large for brute force")
    def sideConnected(subset: Set[Long], anchor: Long): Boolean = {
      val sub = g.inducedByIds(subset)
      val a = sub.indexOf(anchor)
      val lab = sub.labels(a)
      val mask = Array.tabulate(sub.n)(v => sub.labels(v) == lab)
      val comp = sub.componentOf(a, mask)
      (0 until sub.n).forall(v => !mask(v) || comp(v))
    }
    var best: Option[Int] = None
    for (mask <- 0 until (1 << others.length)) {
      val subset = Set(ql, qr) ++
        others.indices.collect { case i if (mask & (1 << i)) != 0 => others(i) }
      if (Model.isValid(g, subset, ql, qr, params) &&
        sideConnected(subset, ql) && sideConnected(subset, qr)) {
        val d = g.inducedByIds(subset).diameter()
        if (best.forall(_ > d)) best = Some(d)
      }
    }
    best
  }

  private def randomBipartiteish(seed: Int): LocalGraph = {
    val rnd = new Random(seed)
    val n = 10 + rnd.nextInt(4)
    val vertices = (0L until n.toLong).map(i => (i, if (i % 2 == 0) "A" else "B"))
    val edges = for {
      a <- 0L until n.toLong; b <- (a + 1) until n.toLong
      if rnd.nextDouble() < 0.45
    } yield (a, b)
    LocalGraph(vertices, edges)
  }

  for (seed <- 1 to 10)
    test(s"greedy answer is within 2x of the brute-force optimum, seed=$seed") {
      val g = randomBipartiteish(seed)
      val ql = 0L
      val qr = 1L
      for (k <- 1 to 2; b <- 0 to 1) {
        val params = BCCParams(k, k, b)
        val greedy = OnlineBCC.run(g, ql, qr, params)
        val opt = bruteForceOptimal(g, ql, qr, params)
        // existence must agree: greedy finds an answer iff one exists
        assert(greedy.isDefined == opt.isDefined, s"k=$k b=$b existence mismatch")
        for { gr <- greedy; o <- opt } {
          assert(gr.diameter <= 2 * o, s"k=$k b=$b: diam ${gr.diameter} > 2 * $o")
          assert(Model.isValid(g, gr.vertexIds, ql, qr, params))
        }
      }
    }

  test("greedy equals the optimum when the whole candidate is optimal") {
    // complete bipartite-plus-cliques gadget: optimum has diameter 1
    val k4Edges = for (i <- 0L to 3L; j <- (i + 1) to 3L) yield (i, j)
    val g = PaperGraphs.cliqueGadget(0L to 3L, k4Edges)
    val res = OnlineBCC.run(g, 0L, 4L, BCCParams(3, 3, 1)).get
    val opt = bruteForceOptimal(g, 0L, 4L, BCCParams(3, 3, 1)).get
    assert(opt == 1)
    assert(res.diameter <= 2 * opt)
  }
}
