package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{GraphGen, QueryGen}
import repro.eval.Harness

/** Reproduces paper Table 4: Online-BCC vs LP-BCC breakdown on DBLP —
  * query-distance time, butterfly/leader maintenance time, number of
  * Algorithm 3 invocations, and total time, with speedups.
  *
  * Paper numbers (1000 queries, real DBLP): query distance 1.58s -> 0.75s
  * (2.1x), leader pair update 4.98s -> 0.46s (10.8x), #butterfly counting
  * 34.86 -> 1.21 (28.8x), total 11.5s -> 4.04s (2.8x).
  */
class Table4BreakdownBench extends AnyFunSuite {

  private val planted = GraphGen.snapLike("dblp-lite")
  private val queries = QueryGen.queries2(planted, n = 100, seed = 404)
  private lazy val bd = Harness.breakdown(planted.graph, queries)

  test("Table 4: Online-BCC vs LP-BCC breakdown on dblp-lite") {
    val on = bd.online
    val lp = bd.lp
    def speed(a: Double, b: Double): String = if (b == 0) "inf" else f"${a / b}%.1fx"
    val rows = Seq(
      Seq("Query distance calculation (s)", Harness.f(on.queryDistSec),
        Harness.f(lp.queryDistSec), speed(on.queryDistSec, lp.queryDistSec), "1.58 -> 0.75 (2.1x)"),
      Seq("Leader/butterfly maintenance (s)",
        Harness.f(on.butterflyCountSec),
        Harness.f(lp.butterflyCountSec + lp.leaderUpdateSec),
        speed(on.butterflyCountSec, lp.butterflyCountSec + lp.leaderUpdateSec),
        "4.98 -> 0.46 (10.8x)"),
      Seq("#butterfly counting (avg/query)",
        Harness.f(on.butterflyCountCalls.toDouble / queries.size),
        Harness.f(lp.butterflyCountCalls.toDouble / queries.size),
        speed(on.butterflyCountCalls.toDouble, lp.butterflyCountCalls.toDouble),
        "34.86 -> 1.21 (28.8x)"),
      Seq("Total time (s)", Harness.f(on.totalSec), Harness.f(lp.totalSec),
        speed(on.totalSec, lp.totalSec), "11.5 -> 4.04 (2.8x)"))
    Harness.printTable(
      "Table 4: Online-BCC vs LP-BCC on dblp-lite (100 queries)",
      Seq("step", "Online-BCC", "LP-BCC", "speedup", "paper (DBLP, 1000 queries)"),
      rows)
    assert(queries.size == 100)
  }

  test("Table 4 shape: LP-BCC calls butterfly counting far less often") {
    assert(bd.lp.butterflyCountCalls < bd.online.butterflyCountCalls)
    // paper: 34.86 vs 1.21 calls per query; require at least a 3x reduction
    assert(bd.lp.butterflyCountCalls * 3 <= bd.online.butterflyCountCalls)
  }

  test("Table 4 shape: LP-BCC query-distance computation is faster") {
    assert(bd.lp.queryDistSec <= bd.online.queryDistSec)
  }

  test("Table 4 shape: LP-BCC butterfly maintenance is faster") {
    assert(
      bd.lp.butterflyCountSec + bd.lp.leaderUpdateSec <= bd.online.butterflyCountSec)
  }

  test("Table 4 shape: LP-BCC total time is lower") {
    assert(bd.lp.totalSec <= bd.online.totalSec)
  }

  test("Table 4 sanity: LP-BCC averages close to one count per query") {
    // findG0 contributes exactly 1 per answered query; re-identification is
    // rare (paper: 1.21) — allow up to 2 on the synthetic workload
    val avg = bd.lp.butterflyCountCalls.toDouble / queries.size
    assert(avg <= 2.0, s"avg=$avg")
  }
}
