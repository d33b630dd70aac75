package repro.core

import scala.collection.mutable
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.graph.{ButterflyCount, KCore, LabeledGraph, LocalGraph}

/** The offline butterfly-core index (paper §6.3): per-vertex coreness within
  * its own label-induced subgraph plus per-label-pair butterfly degrees over
  * the corresponding bipartite cross-edge graph.
  *
  * Coreness is computed eagerly for every label; butterfly degrees are
  * computed per label pair on first use and cached (real networks can have
  * hundreds of labels, so the full pair matrix is built lazily).
  */
final class BCIndex(val g: LocalGraph) {

  /** Coreness of every vertex within its label-induced subgraph. */
  val coreness: Array[Int] = {
    val out = new Array[Int](g.n)
    for (lab <- g.labelSet) {
      val mask = Array.tabulate(g.n)(v => g.labels(v) == lab)
      val c = g.coreness(mask)
      for (v <- 0 until g.n if mask(v)) out(v) = c(v)
    }
    out
  }

  /** Max coreness over the whole graph. */
  val corenessMax: Int = if (g.n == 0) 0 else coreness.max

  private val chiCache = mutable.Map[(String, String), Array[Long]]()

  /** Butterfly degree of every vertex over the bipartite graph between the
    * two labels (0 for vertices of other labels). Cached per pair.
    */
  def butterflyDegrees(labA: String, labB: String): Array[Long] = {
    val key = if (labA <= labB) (labA, labB) else (labB, labA)
    chiCache.getOrElseUpdate(key, {
      val left = Array.tabulate(g.n)(v => g.labels(v) == key._1)
      val right = Array.tabulate(g.n)(v => g.labels(v) == key._2)
      g.butterflyDegrees(left, right)
    })
  }
}

object BCIndex {

  def build(g: LocalGraph): BCIndex = new BCIndex(g)

  /** Distributed index construction: per-label coreness `(id, coreness)` via
    * the iterated h-index dataflow, one label subgraph at a time.
    */
  def corenessSpark(g: LabeledGraph): DataFrame = {
    val labels = g.vertices.select("label").distinct().collect().map(_.getString(0))
    labels
      .map(lab => KCore.coreness(g.labelSubgraph(lab)))
      .reduce(_ union _)
  }

  /** Distributed per-pair butterfly degrees `(id, chi)`. */
  def butterflySpark(g: LabeledGraph, labA: String, labB: String): DataFrame =
    ButterflyCount.perVertex(g.crossEdges(labA, labB))
}
