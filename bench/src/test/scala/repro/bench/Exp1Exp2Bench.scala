package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{GraphGen, QueryGen}
import repro.data.QueryGen.Query2
import repro.eval.Harness

/** Reproduces the paper's headline comparisons as tables:
  * Exp-1 (Figure 4): F1 vs ground truth for CTC / PSA / Online-BCC /
  * LP-BCC / L2P-BCC on the seven networks; Exp-2 (Figure 5): runtime.
  */
object Exp1Exp2Bench {
  /** Shared across both tables: run each network's workload once. */
  lazy val results: Seq[(String, Map[String, Harness.Cell])] = {
    val nQueries = 10
    val twoLabel = Seq("amazon-lite", "dblp-lite", "youtube-lite", "livejournal-lite", "orkut-lite")
    val snap = twoLabel.map { name =>
      val p = GraphGen.snapLike(name)
      val qs = QueryGen.queries2(p, nQueries, seed = 1001)
      name -> Harness.evalAll(new Harness.GraphContext(p.graph), qs)
    }
    val baidu = Seq("baidu1-lite", "baidu2-lite").map { name =>
      val p = GraphGen.baiduLike(name)
      val qs = QueryGen.queriesM(p, m = 2, n = nQueries, seed = 1002).map { q =>
        Query2(q.qs(0), q.qs(1), q.truth)
      }
      name -> Harness.evalAll(new Harness.GraphContext(p.graph), qs)
    }
    baidu ++ snap
  }
}

class Exp1Exp2Bench extends AnyFunSuite {
  import Exp1Exp2Bench.results

  test("Exp-1 (Figure 4): F1 with ground-truth communities") {
    val rows = results.map { case (name, cells) =>
      name +: Harness.methods.map(m => Harness.f(cells(m).meanF1))
    }
    Harness.printTable("Exp-1: mean F1 by network", "network" +: Harness.methods, rows)
    assert(results.size == 7)
  }

  test("Exp-2 (Figure 5): mean query time in seconds") {
    val rows = results.map { case (name, cells) =>
      name +: Harness.methods.map(m => Harness.f(cells(m).meanSec))
    }
    Harness.printTable("Exp-2: mean seconds by network", "network" +: Harness.methods, rows)
    assert(results.size == 7)
  }

  test("Exp-1 shape: BCC methods beat CTC and PSA on average") {
    def avg(m: String): Double = results.map(_._2(m).meanF1).sum / results.size
    for (bcc <- Seq("Online-BCC", "LP-BCC", "L2P-BCC")) {
      assert(avg(bcc) > avg("CTC"), s"$bcc=${avg(bcc)} vs CTC=${avg("CTC")}")
      assert(avg(bcc) > avg("PSA"), s"$bcc=${avg(bcc)} vs PSA=${avg("PSA")}")
    }
  }

  test("Exp-1 shape: youtube-like is the hardest 2-label network for BCC") {
    val m = results.toMap
    val yt = m("youtube-lite")("LP-BCC").meanF1
    val others = Seq("amazon-lite", "dblp-lite", "livejournal-lite", "orkut-lite")
      .map(n => m(n)("LP-BCC").meanF1)
    assert(yt <= others.max, s"youtube=$yt others=$others")
  }

  test("Exp-1 shape: LP-BCC matches Online-BCC quality exactly") {
    for ((name, cells) <- results)
      assert(
        math.abs(cells("LP-BCC").meanF1 - cells("Online-BCC").meanF1) < 1e-9,
        name)
  }

  test("Exp-2 shape: L2P-BCC is the fastest BCC method on average") {
    def avg(m: String): Double = results.map(_._2(m).meanSec).sum / results.size
    assert(avg("L2P-BCC") <= avg("Online-BCC"))
  }

  test("Exp-2 shape: LP-BCC is no slower than Online-BCC on average") {
    def avg(m: String): Double = results.map(_._2(m).meanSec).sum / results.size
    assert(avg("LP-BCC") <= avg("Online-BCC") * 1.1)
  }
}
