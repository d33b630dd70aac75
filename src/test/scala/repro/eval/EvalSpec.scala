package repro.eval

import org.scalatest.funsuite.AnyFunSuite

/** Metric and instrumentation unit tests. */
class EvalSpec extends AnyFunSuite {

  test("precision and recall basics") {
    val found = Set(1L, 2L, 3L, 4L)
    val truth = Set(3L, 4L, 5L, 6L, 7L, 8L)
    assert(F1.precision(found, truth) == 0.5)
    assert(F1.recall(found, truth) == 2.0 / 6.0)
  }

  test("perfect overlap gives F1 = 1") {
    assert(F1.f1(Set(1L, 2L), Set(1L, 2L)) == 1.0)
  }

  test("disjoint sets give F1 = 0") {
    assert(F1.f1(Set(1L), Set(2L)) == 0.0)
  }

  test("empty discovery gives 0 without dividing by zero") {
    assert(F1.precision(Set.empty, Set(1L)) == 0.0)
    assert(F1.f1(Set.empty, Set(1L)) == 0.0)
  }

  test("empty truth gives 0 without dividing by zero") {
    assert(F1.recall(Set(1L), Set.empty) == 0.0)
    assert(F1.f1(Set(1L), Set.empty) == 0.0)
  }

  test("F1 is the harmonic mean") {
    val found = Set(1L, 2L)
    val truth = Set(2L, 3L, 4L)
    val p = F1.precision(found, truth) // 0.5
    val r = F1.recall(found, truth) // 1/3
    assert(math.abs(F1.f1(found, truth) - 2 * p * r / (p + r)) < 1e-12)
  }

  test("instrument timers accumulate") {
    val i = new Instrument
    i.timeQueryDist { Thread.sleep(1) }
    i.timeLeaderUpdate { Thread.sleep(1) }
    i.timeTotal { Thread.sleep(1) }
    assert(i.queryDistNanos > 0 && i.leaderUpdateNanos > 0 && i.totalNanos > 0)
  }

  test("instrument add merges counters") {
    val a = new Instrument
    val b = new Instrument
    a.butterflyCountCalls = 3
    b.butterflyCountCalls = 4
    b.rounds = 2
    a.add(b)
    assert(a.butterflyCountCalls == 7 && a.rounds == 2)
  }
}
