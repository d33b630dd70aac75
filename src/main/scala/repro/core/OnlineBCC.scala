package repro.core

import repro.eval.Instrument
import repro.graph.{LabeledGraph, LocalGraph}

/** Algorithm 1, naive instantiation (the paper's Online-BCC): full BFS query
  * distances and a full butterfly recount on every deletion round.
  */
object OnlineBCC {

  /** Driver-side pipeline on an already-local graph. */
  def run(
      g: LocalGraph,
      qlId: Long,
      qrId: Long,
      params: BCCParams,
      inst: Instrument = new Instrument,
      computeDiameter: Boolean = true): Option[BCCResult] =
    inst.timeTotal {
      LocalBCC.findG0(g, qlId, qrId, params, inst).flatMap { cand =>
        val e = new BCCEngine(cand.g0, params, cand.ql, cand.qr, inst)
        e.seedChi(cand.chi)
        Refine.run(e, Refine.Naive, computeDiameter)
      }
    }

  /** Distributed candidate extraction (Algorithm 2 as DataFrame dataflow)
    * followed by the driver-side refinement loop.
    */
  def runSpark(
      g: LabeledGraph,
      qlId: Long,
      qrId: Long,
      params: BCCParams,
      inst: Instrument = new Instrument,
      computeDiameter: Boolean = true): Option[BCCResult] =
    inst.timeTotal {
      FindG0.find(g, qlId, qrId, params, inst).flatMap { cand =>
        val e = new BCCEngine(cand.g0, params, cand.ql, cand.qr, inst)
        e.seedChi(cand.chi)
        Refine.run(e, Refine.Naive, computeDiameter)
      }
    }
}

/** Algorithm 1 with the fast strategies of Section 6 (the paper's LP-BCC):
  * Algorithm 5 incremental query distances + Algorithm 6/7 leader-pair
  * butterfly maintenance + bulk deletion.
  */
object LPBCC {

  def run(
      g: LocalGraph,
      qlId: Long,
      qrId: Long,
      params: BCCParams,
      inst: Instrument = new Instrument,
      computeDiameter: Boolean = true): Option[BCCResult] =
    inst.timeTotal {
      LocalBCC.findG0(g, qlId, qrId, params, inst).flatMap { cand =>
        val e = new BCCEngine(cand.g0, params, cand.ql, cand.qr, inst)
        e.seedChi(cand.chi)
        Refine.run(e, Refine.FastLP, computeDiameter)
      }
    }

  def runSpark(
      g: LabeledGraph,
      qlId: Long,
      qrId: Long,
      params: BCCParams,
      inst: Instrument = new Instrument,
      computeDiameter: Boolean = true): Option[BCCResult] =
    inst.timeTotal {
      FindG0.find(g, qlId, qrId, params, inst).flatMap { cand =>
        val e = new BCCEngine(cand.g0, params, cand.ql, cand.qr, inst)
        e.seedChi(cand.chi)
        Refine.run(e, Refine.FastLP, computeDiameter)
      }
    }
}
