package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.data.GraphGen
import repro.eval.Instrument

/** Property tests for Algorithms 6-7: the incremental leader butterfly
  * update must track the exact recount through arbitrary deletion
  * sequences, and identification must return a valid leader.
  */
class LeaderPairSpec extends AnyFunSuite {

  private def freshEngine(seed: Int): BCCEngine = {
    val g = GraphGen.randomLabeled(40, 5.0, Seq("A", "B"), seed)
    val ql = (0 until g.n).find(g.labels(_) == "A").get
    val qr = (0 until g.n).find(g.labels(_) == "B").get
    val e = new BCCEngine(g, BCCParams(0, 0, 1), ql, qr, new Instrument)
    e.fullButterflyCount()
    e
  }

  for (seed <- 1 to 15)
    test(s"Algorithm 7 tracks exact butterfly degrees through deletions, seed=$seed") {
      val e = freshEngine(seed)
      val rnd = new Random(seed * 7)
      // pick the two argmax vertices as leaders
      val lL = (0 until e.g.n).filter(e.isLeft).maxBy(e.chi)
      val lR = (0 until e.g.n).filter(e.isRight).maxBy(e.chi)
      var alive = (0 until e.g.n).filter(v => e.alive(v) && v != lL && v != lR)
      for (_ <- 0 until 15 if alive.nonEmpty) {
        val v = alive(rnd.nextInt(alive.length))
        LeaderPair.updateOnDeletion(e, lL, v)
        LeaderPair.updateOnDeletion(e, lR, v)
        e.alive(v) = false
        alive = alive.filter(_ != v)
        val ref = e.g.butterflyDegrees(e.isLeft, e.isRight, e.alive)
        assert(e.chi(lL) == ref(lL), s"left leader after deleting $v")
        assert(e.chi(lR) == ref(lR), s"right leader after deleting $v")
      }
    }

  for (seed <- 1 to 10)
    test(s"identified leader meets the butterfly threshold when possible, seed=$seed") {
      val e = freshEngine(seed + 100)
      val distL = e.g.bfs(Seq(e.ql), e.alive)
      val distR = e.g.bfs(Seq(e.qr), e.alive)
      for (left <- Seq(true, false)) {
        val bMax = e.maxChi(left)
        if (bMax >= e.params.b) {
          val p = LeaderPair.identify(e, left, if (left) distL else distR)
          assert(e.chi(p) >= e.params.b)
          assert(if (left) e.isLeft(p) else e.isRight(p))
        }
      }
    }

  test("identification returns the query vertex when it is the leader") {
    // the query vertex itself has the max butterfly degree
    val g = repro.graph.LocalGraph(
      Seq((0L, "A"), (1L, "A"), (2L, "B"), (3L, "B")),
      Seq((0L, 2L), (0L, 3L), (1L, 2L), (1L, 3L)))
    val e = new BCCEngine(g, BCCParams(0, 0, 1), 0, 2, new Instrument)
    e.fullButterflyCount()
    val p = LeaderPair.identify(e, left = true, g.bfs(Seq(0)))
    assert(p == 0)
  }

  test("updateOnDeletion ignores dead or self vertices") {
    val e = freshEngine(3)
    val lL = (0 until e.g.n).filter(e.isLeft).maxBy(e.chi)
    val before = e.chi(lL)
    LeaderPair.updateOnDeletion(e, lL, lL) // self: no-op
    assert(e.chi(lL) == before)
  }
}
