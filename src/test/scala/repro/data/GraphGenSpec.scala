package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{LocalBCC, OnlineBCC}
import repro.eval.F1

/** Tests for the dataset generators and query workloads. */
class GraphGenSpec extends AnyFunSuite {

  test("generators are deterministic in the seed") {
    val a = GraphGen.snapLike("amazon-lite")
    val b = GraphGen.snapLike("amazon-lite")
    assert(a.graph.n == b.graph.n)
    assert(a.graph.edgeCount == b.graph.edgeCount)
    assert(a.communities.map(_.all) == b.communities.map(_.all))
  }

  for (name <- GraphGen.snapPresets.keys.toSeq.sorted)
    test(s"$name: two labels, planted communities cover the graph") {
      val p = GraphGen.snapLike(name)
      assert(p.graph.labelSet == Set("A", "B"))
      assert(p.communities.nonEmpty)
      val covered = p.communities.flatMap(_.all).toSet
      assert(covered.size == p.graph.n) // every vertex belongs to one community
      for (c <- p.communities.take(10)) {
        assert(c.left.nonEmpty && c.right.nonEmpty)
        assert(c.left.intersect(c.right).isEmpty)
      }
    }

  test("planted communities admit BCC discovery with good F1 on dblp-lite") {
    val p = GraphGen.snapLike("dblp-lite")
    val qs = QueryGen.queries2(p, n = 8, seed = 15)
    val scores = qs.flatMap { q =>
      val params = LocalBCC.defaultParams(p.graph, q.ql, q.qr)
      OnlineBCC.run(p.graph, q.ql, q.qr, params, computeDiameter = false)
        .map(res => F1.f1(res.vertexIds, q.truth))
    }
    assert(scores.nonEmpty)
    val mean = scores.sum / scores.size
    assert(mean > 0.5, s"planted structure should be recoverable, mean F1 = $mean")
  }

  test("baidu-like graphs have one label per team and multi-team projects") {
    val p = GraphGen.baiduLike("baidu1-lite")
    assert(p.graph.labelSet.size == GraphGen.baiduPresets("baidu1-lite").nTeams)
    assert(p.communities.nonEmpty)
    for (c <- p.communities) {
      assert(c.groups.size >= 2)
      for ((lab, members) <- c.groups; id <- members)
        assert(p.graph.labels(p.graph.indexOf(id)) == lab)
    }
  }

  test("baidu2-lite has projects spanning up to 7 teams") {
    val p = GraphGen.baiduLike("baidu2-lite")
    assert(p.communities.map(_.groups.size).max >= 6)
  }

  test("flight-like graph has one label per country") {
    val g = GraphGen.flightLike()
    assert(g.labelSet.size == 20)
    assert(g.n > 200 && g.edgeCount > g.n)
  }

  test("potter-like graph has two camps with cross-camp butterflies") {
    val g = GraphGen.potterLike()
    assert(g.labelSet == Set("justice", "evil"))
    val left = Array.tabulate(g.n)(v => g.labels(v) == "justice")
    val right = left.map(!_)
    val chi = g.butterflyDegrees(left, right)
    assert(chi.max >= 1)
  }

  test("randomLabeled respects requested labels") {
    val g = GraphGen.randomLabeled(50, 3.0, Seq("X", "Y", "Z"), 99)
    assert(g.labelSet.subsetOf(Set("X", "Y", "Z")))
    assert(g.n == 50)
  }

  // ---- QueryGen ----

  test("queries2 picks label-crossing pairs from one community") {
    val p = GraphGen.snapLike("amazon-lite")
    val qs = QueryGen.queries2(p, n = 20, seed = 1)
    assert(qs.size == 20)
    for (q <- qs) {
      val g = p.graph
      assert(g.labels(g.indexOf(q.ql)) == "A")
      assert(g.labels(g.indexOf(q.qr)) == "B")
      assert(q.truth.contains(q.ql) && q.truth.contains(q.qr))
    }
  }

  test("queries2 honors the degree-rank constraint") {
    val p = GraphGen.snapLike("dblp-lite")
    val thr = QueryGen.degreeThreshold(p.graph, 0.8)
    val qs = QueryGen.queries2(p, n = 10, seed = 2, degRankPct = 0.8)
    for (q <- qs) {
      assert(p.graph.degree(p.graph.indexOf(q.ql)) >= thr)
      assert(p.graph.degree(p.graph.indexOf(q.qr)) >= thr)
    }
  }

  test("queries2 honors the inter-distance constraint") {
    val p = GraphGen.snapLike("dblp-lite")
    val qs = QueryGen.queries2(p, n = 5, seed = 3, interDist = 2)
    for (q <- qs) {
      val d = p.graph.bfs(Seq(p.graph.indexOf(q.ql)))(p.graph.indexOf(q.qr))
      assert(d == 2)
    }
  }

  test("queriesM yields m distinct labels per query") {
    val p = GraphGen.baiduLike("baidu1-lite")
    for (m <- 2 to 4; q <- QueryGen.queriesM(p, m, n = 5, seed = 4)) {
      assert(q.qs.size == m)
      val labs = q.qs.map(id => p.graph.labels(p.graph.indexOf(id)))
      assert(labs.distinct.size == m)
    }
  }

  test("degreeThreshold is monotone in the percentile") {
    val p = GraphGen.snapLike("amazon-lite")
    assert(QueryGen.degreeThreshold(p.graph, 0.5) <= QueryGen.degreeThreshold(p.graph, 0.9))
  }
}
