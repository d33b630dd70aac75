package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{GraphGen, QueryGen}
import repro.graph.LocalGraph

/** Tests for the multi-labeled BCC model (Section 7). */
class MultiBCCSpec extends AnyFunSuite {

  private val planted = GraphGen.baiduLike("baidu1-lite")

  /** Structural validation against Def. 8. */
  private def validateMBCC(
      g: LocalGraph,
      res: MultiBCC.MBCCResult,
      qs: Seq[Long],
      ks: Seq[Int],
      b: Int): Unit = {
    assert(qs.forall(res.vertexIds.contains), "missing a query vertex")
    val sub = g.inducedByIds(res.vertexIds)
    val labs = res.labels.toSet
    assert(sub.labelSet == labs, s"labels ${sub.labelSet} != $labs")
    // each group is a k_i-core in its induced label subgraph
    for (v <- 0 until sub.n) {
      val i = res.labels.indexOf(sub.labels(v))
      val intra = sub.neighbors(v).count(u => sub.labels(u) == sub.labels(v))
      assert(intra >= ks(i), s"vertex ${sub.ids(v)} intra degree $intra < ${ks(i)}")
    }
    // cross-group connectivity over the label meta-graph
    val m = res.labels.length
    val masks = res.labels.map(l => Array.tabulate(sub.n)(v => sub.labels(v) == l))
    val parent = Array.tabulate(m)(identity)
    def find(x: Int): Int = { var r = x; while (parent(r) != r) r = parent(r); r }
    for (i <- 0 until m; j <- i + 1 until m) {
      val chi = sub.butterflyDegrees(masks(i), masks(j))
      val maxI = (0 until sub.n).filter(masks(i)).map(chi).foldLeft(0L)(math.max)
      val maxJ = (0 until sub.n).filter(masks(j)).map(chi).foldLeft(0L)(math.max)
      if (maxI >= b && maxJ >= b) parent(find(i)) = find(j)
    }
    assert((0 until m).map(find).distinct.size == 1, "label meta-graph not connected")
    // whole community connected
    assert(!sub.bfs(Seq(0)).contains(LocalGraph.Inf), "community not connected")
  }

  for (m <- 2 to 4) {
    val queries = QueryGen.queriesM(planted, m, n = 4, seed = m * 10)
    for ((q, i) <- queries.zipWithIndex)
      test(s"m=$m query $i: mBCC answer is valid when found") {
        val ks = Seq.fill(m)(2)
        MultiBCC.run(planted.graph, q.qs, ks, b = 1).foreach { res =>
          validateMBCC(planted.graph, res, q.qs, ks, 1)
        }
      }
  }

  test("m=2 mBCC agrees with the 2-label BCC search") {
    val queries = QueryGen.queriesM(planted, 2, n = 6, seed = 3)
    var agreed = 0
    for (q <- queries) {
      val Seq(ql, qr) = q.qs
      val mres = MultiBCC.run(planted.graph, q.qs, Seq(2, 2), b = 1)
      val bres = OnlineBCC.run(planted.graph, ql, qr, BCCParams(2, 2, 1), computeDiameter = false)
      assert(mres.isDefined == bres.isDefined)
      for { mr <- mres; br <- bres } {
        assert(mr.vertexIds == br.vertexIds)
        agreed += 1
      }
    }
    assert(agreed > 0, "no query produced a community; generator too sparse")
  }

  for (m <- 2 to 4)
    test(s"m=$m: fast (LP-style) mode returns the same community as naive mode") {
      val queries = QueryGen.queriesM(planted, m, n = 3, seed = m * 31)
      for (q <- queries) {
        val ks = Seq.fill(m)(2)
        val slow = MultiBCC.run(planted.graph, q.qs, ks, b = 1)
        val fast = MultiBCC.run(planted.graph, q.qs, ks, b = 1, fast = true)
        assert(slow.map(_.vertexIds) == fast.map(_.vertexIds))
        assert(slow.map(_.queryDistance) == fast.map(_.queryDistance))
      }
    }

  test("duplicate labels in the query are rejected") {
    val c = planted.communities.head
    val (lab, members) = c.groups.head
    val two = members.take(2).toSeq
    assert(MultiBCC.run(planted.graph, two, Seq(1, 1), b = 1).isEmpty)
  }

  test("m=1 query is rejected") {
    intercept[IllegalArgumentException] {
      MultiBCC.run(planted.graph, Seq(planted.graph.ids(0)), Seq(1), b = 1)
    }
  }

  test("impossible core parameters return no community") {
    val q = QueryGen.queriesM(planted, 2, n = 1, seed = 4).head
    assert(MultiBCC.run(planted.graph, q.qs, Seq(1000, 1000), b = 1).isEmpty)
  }
}
