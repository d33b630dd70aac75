package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.data.{GraphGen, QueryGen}
import repro.eval.Harness

/** Reproduces Exp-4 (Figures 8-9): parameter sensitivity of the core value
  * k (= k1 = k2) and the butterfly threshold b on query time, plus the
  * structural driver the paper cites (larger k => smaller candidate G0).
  */
class Exp4ParamSensitivityBench extends AnyFunSuite {

  private val planted = GraphGen.snapLike("dblp-lite")
  private val queries = QueryGen.queries2(planted, n = 8, seed = 808)
  private val index = BCIndex.build(planted.graph)

  private def timeFor(params: BCCParams): (Double, Double, Double) = {
    var (on, lp, l2p) = (0.0, 0.0, 0.0)
    for (q <- queries) {
      def t(f: => Any): Double = {
        val t0 = System.nanoTime(); f; (System.nanoTime() - t0) / 1e9
      }
      on += t(OnlineBCC.run(planted.graph, q.ql, q.qr, params, computeDiameter = false))
      lp += t(LPBCC.run(planted.graph, q.ql, q.qr, params, computeDiameter = false))
      l2p += t(L2PBCC.run(planted.graph, q.ql, q.qr, params, index, computeDiameter = false))
    }
    (on / queries.size, lp / queries.size, l2p / queries.size)
  }

  private val ks = Seq(2, 3, 4, 5)
  private val bs = Seq(1, 2, 3, 4)

  test("Exp-4 (Figure 8): query time varying the core value k") {
    val rows = ks.map { k =>
      val (on, lp, l2p) = timeFor(BCCParams(k, k, 1))
      Seq(s"k=$k", Harness.f(on), Harness.f(lp), Harness.f(l2p))
    }
    Harness.printTable(
      "Exp-4a: mean seconds vs core value k (dblp-lite)",
      Seq("k", "Online-BCC", "LP-BCC", "L2P-BCC"),
      rows)
    assert(rows.size == ks.size)
  }

  test("Exp-4 (Figure 9): query time varying the butterfly threshold b") {
    val rows = bs.map { b =>
      val (on, lp, l2p) = timeFor(BCCParams(3, 3, b))
      Seq(s"b=$b", Harness.f(on), Harness.f(lp), Harness.f(l2p))
    }
    Harness.printTable(
      "Exp-4b: mean seconds vs butterfly threshold b (dblp-lite)",
      Seq("b", "Online-BCC", "LP-BCC", "L2P-BCC"),
      rows)
    assert(rows.size == bs.size)
  }

  test("Exp-4 shape: larger k produces a (weakly) smaller candidate G0") {
    for (q <- queries.take(4)) {
      val sizes = ks.map { k =>
        LocalBCC.findG0(planted.graph, q.ql, q.qr, BCCParams(k, k, 1))
          .map(_.g0.n)
          .getOrElse(0)
      }
      for (Seq(a, b) <- sizes.sliding(2))
        assert(b <= a, s"G0 sizes not nested: $sizes")
    }
  }

  test("Exp-4 shape: candidate G0 does not depend on b beyond feasibility") {
    val q = queries.head
    val s1 = LocalBCC.findG0(planted.graph, q.ql, q.qr, BCCParams(3, 3, 1)).map(_.g0.n)
    val s2 = LocalBCC.findG0(planted.graph, q.ql, q.qr, BCCParams(3, 3, 2)).map(_.g0.n)
    for { a <- s1; b <- s2 } assert(a == b)
  }
}
