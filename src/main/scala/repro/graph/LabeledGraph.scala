package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** DataFrame-backed labeled graph: the distributed substrate.
  *
  * - `vertices`: columns `(id: Long, label: String)`
  * - `edges`: canonical undirected edges, columns `(src: Long, dst: Long)`
  *   with `src < dst`, deduplicated, self-loop free.
  *
  * All bulk graph dataflow (degree, peeling, components, BFS, butterflies)
  * operates on these two DataFrames via Catalyst; see the sibling objects in
  * this package.
  */
final case class LabeledGraph(vertices: DataFrame, edges: DataFrame) {

  /** Symmetric edge view `(src, dst)` with both directions present. */
  def symEdges: DataFrame =
    edges.union(edges.select(col("dst").as("src"), col("src").as("dst")))

  /** Per-vertex degree `(id, deg)`; isolated vertices get 0. */
  def degrees: DataFrame =
    vertices
      .join(symEdges.groupBy(col("src").as("id")).agg(count("*").as("deg")), Seq("id"), "left")
      .select(col("id"), coalesce(col("deg"), lit(0L)).as("deg"))

  /** Number of vertices. */
  def numVertices: Long = vertices.count()

  /** Number of undirected edges. */
  def numEdges: Long = edges.count()

  /** Label of a vertex, if present. */
  def labelOf(id: Long): Option[String] =
    vertices.filter(col("id") === id).select("label").collect().headOption.map(_.getString(0))

  /** Induced subgraph on the vertices in `keep` (a DataFrame with `id`). */
  def induced(keep: DataFrame): LabeledGraph = {
    val k = keep.select("id").distinct()
    val vs = vertices.join(k, Seq("id"))
    val es = edges
      .join(k.select(col("id").as("src")), Seq("src"))
      .join(k.select(col("id").as("dst")), Seq("dst"))
      .select("src", "dst")
    LabeledGraph(vs, es)
  }

  /** Induced subgraph on the vertices with the given label. */
  def labelSubgraph(label: String): LabeledGraph =
    induced(vertices.filter(col("label") === label).select("id"))

  /** Cross edges between two label classes, oriented left-label first:
    * `(l, r)` where `label(l) = leftLabel` and `label(r) = rightLabel`.
    */
  def crossEdges(leftLabel: String, rightLabel: String): DataFrame = {
    val lab = vertices.select(col("id"), col("label"))
    symEdges
      .join(lab.select(col("id").as("src"), col("label").as("slab")), Seq("src"))
      .join(lab.select(col("id").as("dst"), col("label").as("dlab")), Seq("dst"))
      .filter(col("slab") === leftLabel && col("dlab") === rightLabel)
      .select(col("src").as("l"), col("dst").as("r"))
  }

  /** Collect into a driver-side [[LocalGraph]] (candidate communities only). */
  def toLocal: LocalGraph = {
    val vs = vertices.select("id", "label").collect().map(r => (r.getLong(0), r.getString(1)))
    val es = edges.select("src", "dst").collect().map(r => (r.getLong(0), r.getLong(1)))
    LocalGraph(vs.toSeq, es.toSeq)
  }

  /** Cache both sides and materialize. */
  def cached(): LabeledGraph = {
    val g = LabeledGraph(vertices.cache(), edges.cache())
    g.vertices.count(); g.edges.count()
    g
  }
}

object LabeledGraph {

  /** Build from raw vertex/edge DataFrames, canonicalizing the edges:
    * undirected, deduplicated, self-loop free, `src < dst`, endpoints must
    * exist in `vertices`.
    */
  def apply(spark: SparkSession, rawVertices: DataFrame, rawEdges: DataFrame): LabeledGraph = {
    val vs = rawVertices
      .select(col("id").cast("long"), col("label").cast("string"))
      .dropDuplicates("id")
    val ids = vs.select("id")
    val es = rawEdges
      .select(
        least(col("src").cast("long"), col("dst").cast("long")).as("src"),
        greatest(col("src").cast("long"), col("dst").cast("long")).as("dst"))
      .filter(col("src") =!= col("dst"))
      .dropDuplicates("src", "dst")
      .join(ids.select(col("id").as("src")), Seq("src"))
      .join(ids.select(col("id").as("dst")), Seq("dst"))
      .select("src", "dst")
    LabeledGraph(vs, es)
  }

  /** Build a distributed graph from a driver-side [[LocalGraph]]. */
  def fromLocal(spark: SparkSession, g: LocalGraph): LabeledGraph = {
    import spark.implicits._
    val vs = (0 until g.n).map(v => (g.ids(v), g.labels(v))).toDF("id", "label")
    val es = g.edges.map { case (u, v) =>
      val a = g.ids(u); val b = g.ids(v)
      (math.min(a, b), math.max(a, b))
    }.toSeq.toDF("src", "dst")
    LabeledGraph(vs, es)
  }

  /** Build from in-memory sequences (tests, generators). */
  def fromSeqs(
      spark: SparkSession,
      vertices: Seq[(Long, String)],
      edges: Seq[(Long, Long)]): LabeledGraph = {
    import spark.implicits._
    apply(spark, vertices.toDF("id", "label"), edges.toDF("src", "dst"))
  }
}
