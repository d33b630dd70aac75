package repro.core

import org.apache.spark.sql.functions._
import repro.eval.Instrument
import repro.graph._

/** Fully distributed Algorithm 1: every refinement round runs as DataFrame
  * dataflow — distributed BFS for query distances, iterative anti-join
  * peeling for per-side core maintenance, and the wedge-join butterfly
  * count for the leader constraint. Bulk deletion keeps the round count
  * equal to the driver-side loop, so the returned community is *identical*
  * to [[OnlineBCC.run]] (asserted in SparkPipelineSpec).
  *
  * Each round costs several Spark jobs; this variant demonstrates the
  * iterative-join execution path end to end and is meant for cluster-scale
  * graphs where the candidate exceeds driver memory. The hybrid pipelines
  * (distributed Algorithm 2 + driver-side refinement) remain the fast path
  * at bench scale.
  */
object DistOnlineBCC {

  private val Inf = Int.MaxValue

  def run(
      g: LabeledGraph,
      qlId: Long,
      qrId: Long,
      params: BCCParams,
      inst: Instrument = new Instrument,
      maxRounds: Int = 1000): Option[BCCResult] = inst.timeTotal {
    val spark = g.vertices.sparkSession
    val lLab = g.labelOf(qlId).getOrElse(return None)
    val rLab = g.labelOf(qrId).getOrElse(return None)
    if (lLab == rLab) return None

    // Algorithm 2, distributed, then keep the candidate as a DataFrame graph
    val cand = FindG0.find(g, qlId, qrId, params, inst).getOrElse(return None)
    var cur = LabeledGraph.fromLocal(spark, cand.g0).cached()

    var best: Option[(Set[Long], Int)] = None
    var go = true
    var rounds = 0
    while (go && rounds < maxRounds) {
      rounds += 1
      inst.rounds += 1
      val dl = BFS.distances(cur, Seq(qlId)).select(col("id"), col("dist").as("dl"))
      val dr = BFS.distances(cur, Seq(qrId)).select(col("id"), col("dist").as("dr"))
      val qd = cur.vertices
        .join(dl, Seq("id"), "left")
        .join(dr, Seq("id"), "left")
        .select(
          col("id"),
          when(col("dl").isNull || col("dr").isNull, lit(Inf))
            .otherwise(greatest(col("dl"), col("dr")))
            .as("qd"))
        .localCheckpoint(true)
      val qlRow = qd.filter(col("id") === qlId).collect()
      if (qlRow.isEmpty || qlRow(0).getInt(1) == Inf) go = false // Q disconnected
      else {
        val maxQd = qd.agg(max("qd")).collect()(0).getInt(0)
        if (maxQd != Inf) {
          val better = best.forall(_._2 > maxQd)
          if (better)
            best = Some((qd.select("id").collect().map(_.getLong(0)).toSet, maxQd))
        }
        val batch = qd.filter(col("qd") === maxQd).select("id").localCheckpoint(true)
        val batchHasQ =
          batch.filter(col("id") === qlId || col("id") === qrId).limit(1).count() > 0
        if (batchHasQ) go = false
        else {
          val kept = cur.vertices.join(batch, Seq("id"), "left_anti").select("id", "label")
          val shrunk = cur.induced(kept)
          // per-side core maintenance as iterative peeling
          val lCore = KCore.kCoreVertices(shrunk.labelSubgraph(lLab), params.k1)
          val rCore = KCore.kCoreVertices(shrunk.labelSubgraph(rLab), params.k2)
          val keepIds = lCore.union(rCore).distinct().localCheckpoint(true)
          val hasQl = keepIds.filter(col("id") === qlId).limit(1).count() > 0
          val hasQr = keepIds.filter(col("id") === qrId).limit(1).count() > 0
          if (!hasQl || !hasQr) go = false
          else {
            val next = shrunk.induced(keepIds).cached()
            // butterfly constraint on the maintained bipartite graph
            inst.butterflyCountCalls += 1
            val chi = ButterflyCount.perVertex(next.crossEdges(lLab, rLab))
            val lab = next.vertices
            def maxChi(label: String): Long = {
              val r = chi
                .join(lab.filter(col("label") === label).select("id"), Seq("id"))
                .agg(max("chi"))
                .collect()(0)
              if (r.isNullAt(0)) 0L else r.getLong(0)
            }
            if (maxChi(lLab) < params.b || maxChi(rLab) < params.b) go = false
            else cur = next
          }
        }
      }
    }

    best.map { case (ids, qdVal) =>
      BCCResult(ids, lLab, rLab, qdVal, -1, rounds)
    }
  }
}
