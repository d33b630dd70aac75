package repro.jobs

import repro.data.{GraphGen, QueryGen}
import repro.eval.Harness

/** spark-submit entrypoint reproducing paper Table 4: the Online-BCC vs
  * LP-BCC step breakdown on the DBLP-like network.
  *
  * Usage: spark-submit --class repro.jobs.Table4Breakdown repro.jar [nQueries]
  */
object Table4Breakdown {

  def main(args: Array[String]): Unit = {
    val nQueries = args.headOption.map(_.toInt).getOrElse(100)
    val planted = GraphGen.snapLike("dblp-lite")
    val queries = QueryGen.queries2(planted, nQueries, seed = 404)
    val bd = Harness.breakdown(planted.graph, queries)
    val on = bd.online
    val lp = bd.lp
    def speed(a: Double, b: Double): String = if (b == 0) "inf" else f"${a / b}%.1fx"
    Harness.printTable(
      s"Table 4 (dblp-lite, $nQueries queries)",
      Seq("step", "Online-BCC", "LP-BCC", "speedup"),
      Seq(
        Seq("Query distance calculation (s)", Harness.f(on.queryDistSec),
          Harness.f(lp.queryDistSec), speed(on.queryDistSec, lp.queryDistSec)),
        Seq("Leader/butterfly maintenance (s)", Harness.f(on.butterflyCountSec),
          Harness.f(lp.butterflyCountSec + lp.leaderUpdateSec),
          speed(on.butterflyCountSec, lp.butterflyCountSec + lp.leaderUpdateSec)),
        Seq("#butterfly counting (avg/query)",
          Harness.f(on.butterflyCountCalls.toDouble / queries.size),
          Harness.f(lp.butterflyCountCalls.toDouble / queries.size),
          speed(on.butterflyCountCalls.toDouble, lp.butterflyCountCalls.toDouble)),
        Seq("Total time (s)", Harness.f(on.totalSec), Harness.f(lp.totalSec),
          speed(on.totalSec, lp.totalSec))))
  }
}
