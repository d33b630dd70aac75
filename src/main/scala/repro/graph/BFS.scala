package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Distributed breadth-first search as iterative frontier joins.
  *
  * Each round the current frontier joins the symmetric edge list to produce
  * the next frontier (neighbors not yet visited). Used for query-distance
  * computation in the distributed refinement variant and for diameter-ish
  * statistics at graph scale.
  */
object BFS {

  /** `(id, dist)` of every vertex reachable from any of `sources`;
    * unreachable vertices are absent from the result.
    */
  def distances(g: LabeledGraph, sources: Seq[Long]): DataFrame = {
    val spark = g.vertices.sparkSession
    import spark.implicits._
    val sym = g.symEdges.localCheckpoint(true)
    var visited = sources.distinct.map(s => (s, 0)).toDF("id", "dist").localCheckpoint(true)
    var frontier = visited
    var level = 0
    var done = false
    while (!done) {
      level += 1
      val next = sym
        .join(frontier.select(col("id").as("src")), Seq("src"))
        .select(col("dst").as("id"))
        .distinct()
        .join(visited.select("id"), Seq("id"), "left_anti")
        .select(col("id"), lit(level).as("dist"))
        .localCheckpoint(true)
      if (next.isEmpty) done = true
      else {
        visited = visited.union(next).localCheckpoint(true)
        frontier = next
      }
    }
    visited
  }

  /** Eccentricity of `source`: max BFS distance over its component. */
  def eccentricity(g: LabeledGraph, source: Long): Int =
    distances(g, Seq(source)).agg(max("dist")).collect()(0).getInt(0)
}
