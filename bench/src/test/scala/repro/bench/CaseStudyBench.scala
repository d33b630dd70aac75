package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.baseline.CTC
import repro.core._
import repro.data.GraphGen
import repro.eval.Harness

/** Qualitative case studies (Exp-6..8): the BCC model discovers two-group
  * cross communities on flight-like and fiction-like networks where the
  * label-blind CTC stays inside one group or mixes labels — the paper's
  * central qualitative claim.
  */
class CaseStudyBench extends AnyFunSuite {

  test("Exp-6: flight-like network — BCC spans exactly two countries") {
    val g = GraphGen.flightLike()
    val index = BCIndex.build(g)
    // pick the best-connected country pair: the one whose bipartite graph
    // has the largest leader butterfly degree
    val labels = g.labelSet.toSeq.sorted
    val best = (for {
      i <- labels.indices; j <- i + 1 until labels.length
      chi = index.butterflyDegrees(labels(i), labels(j))
      m = chi.max if m > 0
    } yield (labels(i), labels(j), m)).maxBy(_._3)
    val (cA, cB, _) = best
    // query the top hub of each country (ids are generated hub-first)
    val qa = (0 until g.n).filter(v => g.labels(v) == cA).minBy(g.ids(_))
    val qb = (0 until g.n).filter(v => g.labels(v) == cB).minBy(g.ids(_))
    val params = LocalBCC.defaultParams(g, g.ids(qa), g.ids(qb), b = 1)
    val res = LPBCC.run(g, g.ids(qa), g.ids(qb), params)
    assert(res.isDefined, "no flight BCC found")
    val community = res.get.vertexIds
    val labs = community.map(id => g.labels(g.indexOf(id)))
    assert(labs == Set(cA, cB), s"labels in answer: $labs")
    println(s"[case-study] flight BCC between $cA and $cB: ${community.size} cities, " +
      s"k=(${params.k1},${params.k2}), diam=${res.get.diameter}")
    // CTC, by contrast, is free to ignore country labels entirely
    val ctc = CTC.run(g, Seq(g.ids(qa), g.ids(qb)))
    ctc.foreach { c =>
      val ctcLabs = c.map(id => g.labels(g.indexOf(id)))
      println(s"[case-study] flight CTC: ${c.size} cities across ${ctcLabs.size} countries")
    }
  }

  test("Exp-8: potter-like network — BCC finds both camps with their leaders") {
    val g = GraphGen.potterLike()
    // leaders are the lowest ids of each camp by construction
    val good = (0 until g.n).filter(v => g.labels(v) == "justice").minBy(g.ids(_))
    val evil = (0 until g.n).filter(v => g.labels(v) == "evil").minBy(g.ids(_))
    // modest cores so both camps keep their families (paper Fig. 13 shows
    // Ron's whole family in the answer, not just the densest clique)
    val params = BCCParams(3, 3, 1)
    val res = LPBCC.run(g, g.ids(good), g.ids(evil), params)
    assert(res.isDefined, "no potter BCC found")
    val c = res.get.vertexIds
    assert(c.contains(g.ids(good)) && c.contains(g.ids(evil)))
    val justiceSide = c.count(id => g.labels(g.indexOf(id)) == "justice")
    val evilSide = c.size - justiceSide
    assert(justiceSide >= 2 && evilSide >= 2, "both camps must be represented")
    println(s"[case-study] potter BCC: $justiceSide justice + $evilSide evil, " +
      s"diam=${res.get.diameter}")
  }

  test("Exp-7 stand-in: BCC validity holds on the trade-like regime (flight graph, b=3)") {
    // the paper's trade case study uses b = 3; re-run the flight network at
    // the stricter threshold and validate the model constraints end to end
    val g = GraphGen.flightLike()
    val index = BCIndex.build(g)
    val labels = g.labelSet.toSeq.sorted
    val candidates = for {
      i <- labels.indices; j <- i + 1 until labels.length
      chi = index.butterflyDegrees(labels(i), labels(j))
      m = chi.max if m >= 3
    } yield (labels(i), labels(j))
    assume(candidates.nonEmpty, "no country pair with butterfly degree >= 3")
    val (cA, cB) = candidates.head
    val qa = (0 until g.n).filter(v => g.labels(v) == cA).minBy(g.ids(_))
    val qb = (0 until g.n).filter(v => g.labels(v) == cB).minBy(g.ids(_))
    val params = LocalBCC.defaultParams(g, g.ids(qa), g.ids(qb), b = 3)
    LPBCC.run(g, g.ids(qa), g.ids(qb), params).foreach { res =>
      assert(Model.isValid(g, res.vertexIds, g.ids(qa), g.ids(qb), params))
      println(s"[case-study] trade-regime BCC ($cA-$cB, b=3): ${res.vertexIds.size} members")
    }
  }
}
