package repro.core

import org.apache.spark.sql.functions._
import repro.eval.Instrument
import repro.graph._

/** Algorithm 2 as distributed DataFrame dataflow: per-label k-core peeling
  * (iterative anti-joins), connected component of each query (iterative
  * min-propagation), bipartite butterfly counting (wedge self-join), then
  * collect the induced candidate `G0` to the driver for refinement.
  */
object FindG0 {

  /** Find the maximal connected (k1,k2,b)-BCC candidate containing the
    * queries; returns the collected candidate and query indices.
    */
  def find(
      g: LabeledGraph,
      qlId: Long,
      qrId: Long,
      params: BCCParams,
      inst: Instrument = new Instrument): Option[Candidate] = {
    val lLab = g.labelOf(qlId).getOrElse(return None)
    val rLab = g.labelOf(qrId).getOrElse(return None)
    if (lLab == rLab) return None

    def sideComponent(label: String, q: Long, k: Int) = {
      val sub = g.labelSubgraph(label).cached()
      val core = KCore.kCoreVertices(sub, k)
      val coreGraph = sub.induced(core)
      val contains = core.filter(col("id") === q).limit(1).count() > 0
      if (!contains) None
      else Some(ConnectedComponents.componentOf(coreGraph, q).localCheckpoint(true))
    }

    val leftComp = sideComponent(lLab, qlId, params.k1).getOrElse(return None)
    val rightComp = sideComponent(rLab, qrId, params.k2).getOrElse(return None)

    // bipartite graph between the two components
    val cross = g
      .crossEdges(lLab, rLab)
      .join(leftComp.select(col("id").as("l")), Seq("l"))
      .join(rightComp.select(col("id").as("r")), Seq("r"))
      .select("l", "r")
    inst.butterflyCountCalls += 1
    val chi = ButterflyCount.perVertex(cross).localCheckpoint(true)
    def maxChiOf(compIds: org.apache.spark.sql.DataFrame): Long = {
      val r = chi.join(compIds, Seq("id")).agg(max("chi")).collect()(0)
      if (r.isNullAt(0)) 0L else r.getLong(0)
    }
    if (maxChiOf(leftComp) < params.b || maxChiOf(rightComp) < params.b) return None

    val keep = leftComp.union(rightComp).distinct()
    val g0 = g.induced(keep).toLocal
    val chiMap = chi.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    val chi0 = Array.tabulate(g0.n)(v => chiMap.getOrElse(g0.ids(v), 0L))
    Some(Candidate(g0, g0.indexOf(qlId), g0.indexOf(qrId), chi0))
  }
}
