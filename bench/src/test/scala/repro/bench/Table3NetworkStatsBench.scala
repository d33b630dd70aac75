package repro.bench

import repro.SparkSpec
import repro.data.GraphGen
import repro.graph.{LabeledGraph, LocalGraph}
import org.apache.spark.sql.functions._

/** Reproduces paper Table 3 (network statistics) for the substituted
  * networks at repro scale. |V|, |E|, #labels and d_max come from the
  * distributed DataFrame path; k_max (graph coreness) from the local
  * decomposition (the two are equivalence-tested in DistributedGraphSpec).
  */
class Table3NetworkStatsBench extends SparkSpec {

  /** name -> (|V|, |E|, labels, k_max, d_max) from the paper's Table 3. */
  private val paper = Seq(
    "baidu1-lite" -> ("Baidu-1", "30K", "508K", 383, 43, 12),
    "baidu2-lite" -> ("Baidu-2", "41K", "2M", 346, 189, 13),
    "amazon-lite" -> ("Amazon", "335K", "926K", 2, 6, 549),
    "dblp-lite" -> ("DBLP", "317K", "1M", 2, 113, 342),
    "youtube-lite" -> ("Youtube", "1.1M", "3M", 2, 51, 28754),
    "livejournal-lite" -> ("LiveJournal", "4M", "35M", 2, 360, 14815),
    "orkut-lite" -> ("Orkut", "3.1M", "117M", 2, 253, 33313))

  private def graphOf(name: String): LocalGraph =
    if (name.startsWith("baidu")) GraphGen.baiduLike(name).graph
    else GraphGen.snapLike(name).graph

  private lazy val stats: Seq[(String, (Long, Long, Long, Int, Long))] =
    paper.map { case (name, _) =>
      val lg = graphOf(name)
      val g = LabeledGraph.fromLocal(spark, lg)
      val nV = g.numVertices
      val nE = g.numEdges
      val nLab = g.vertices.select("label").distinct().count()
      val dMax = g.degrees.agg(max("deg")).collect()(0).getLong(0)
      val kMax = lg.coreness().max
      name -> ((nV, nE, nLab, kMax, dMax))
    }

  test("Table 3: network statistics (paper vs repro)") {
    val rows = paper.map { case (name, (pname, pv, pe, plab, pk, pd)) =>
      val (nV, nE, nLab, kMax, dMax) = stats.toMap.apply(name)
      Seq(pname, pv, pe, plab.toString, pk.toString, pd.toString,
        name, nV.toString, nE.toString, nLab.toString, kMax.toString, dMax.toString)
    }
    repro.eval.Harness.printTable(
      "Table 3: network statistics",
      Seq("paper net", "|V|", "|E|", "labels", "k_max", "d_max",
        "repro net", "|V|", "|E|", "labels", "k_max", "d_max"),
      rows)
    assert(stats.size == 7)
  }

  test("Table 3 shape: snap-like networks carry exactly 2 labels") {
    for ((name, (_, _, nLab, _, _)) <- stats if !name.startsWith("baidu"))
      assert(nLab == 2L, name)
  }

  test("Table 3 shape: baidu-like networks carry many labels") {
    val m = stats.toMap
    assert(m("baidu1-lite")._3 == 40)
    assert(m("baidu2-lite")._3 == 60)
    assert(m("baidu2-lite")._3 > m("baidu1-lite")._3) // paper: 346 vs 383 sizes differ
  }

  test("Table 3 shape: orkut-lite is the largest and densest snap network") {
    val m = stats.toMap
    val snaps = Seq("amazon-lite", "dblp-lite", "youtube-lite", "livejournal-lite")
    for (s <- snaps) {
      assert(m("orkut-lite")._2 > m(s)._2, s"edges: orkut vs $s")
      assert(m("orkut-lite")._4 >= m(s)._4, s"k_max: orkut vs $s")
    }
  }

  test("Table 3 shape: amazon-lite has the smallest k_max, like the paper") {
    val m = stats.toMap
    val others = Seq("dblp-lite", "livejournal-lite", "orkut-lite")
    for (s <- others) assert(m("amazon-lite")._4 <= m(s)._4, s)
  }
}
