package repro.jobs

import repro.data.{GraphGen, QueryGen}
import repro.data.QueryGen.Query2
import repro.eval.Harness

/** spark-submit entrypoint reproducing Exp-1 (Figure 4, F1 quality) and
  * Exp-2 (Figure 5, efficiency) over the seven substituted networks.
  *
  * Usage: spark-submit --class repro.jobs.Exp1Exp2 repro.jar [nQueries]
  */
object Exp1Exp2 {

  def main(args: Array[String]): Unit = {
    val nQueries = args.headOption.map(_.toInt).getOrElse(10)
    val twoLabel =
      Seq("amazon-lite", "dblp-lite", "youtube-lite", "livejournal-lite", "orkut-lite")
    val results =
      Seq("baidu1-lite", "baidu2-lite").map { name =>
        val p = GraphGen.baiduLike(name)
        val qs = QueryGen.queriesM(p, m = 2, n = nQueries, seed = 1002).map { q =>
          Query2(q.qs(0), q.qs(1), q.truth)
        }
        name -> Harness.evalAll(new Harness.GraphContext(p.graph), qs)
      } ++ twoLabel.map { name =>
        val p = GraphGen.snapLike(name)
        val qs = QueryGen.queries2(p, nQueries, seed = 1001)
        name -> Harness.evalAll(new Harness.GraphContext(p.graph), qs)
      }
    Harness.printTable(
      "Exp-1: mean F1 by network",
      "network" +: Harness.methods,
      results.map { case (n, c) => n +: Harness.methods.map(m => Harness.f(c(m).meanF1)) })
    Harness.printTable(
      "Exp-2: mean seconds by network",
      "network" +: Harness.methods,
      results.map { case (n, c) => n +: Harness.methods.map(m => Harness.f(c(m).meanSec)) })
  }
}
