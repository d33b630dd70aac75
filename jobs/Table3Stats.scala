package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.data.GraphGen
import repro.eval.Harness
import repro.graph.LabeledGraph

/** spark-submit entrypoint reproducing paper Table 3 (network statistics)
  * over the substituted networks: |V|, |E|, #labels and d_max from the
  * distributed DataFrame path, k_max from the core decomposition.
  *
  * Usage: spark-submit --class repro.jobs.Table3Stats repro.jar
  */
object Table3Stats {

  val networks: Seq[String] = Seq(
    "baidu1-lite", "baidu2-lite", "amazon-lite", "dblp-lite",
    "youtube-lite", "livejournal-lite", "orkut-lite")

  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("bcc-table3")
      .getOrCreate()
    val rows = networks.map { name =>
      val lg =
        if (name.startsWith("baidu")) GraphGen.baiduLike(name).graph
        else GraphGen.snapLike(name).graph
      val g = LabeledGraph.fromLocal(spark, lg)
      Seq(
        name,
        g.numVertices.toString,
        g.numEdges.toString,
        g.vertices.select("label").distinct().count().toString,
        lg.coreness().max.toString,
        g.degrees.agg(max("deg")).collect()(0).getLong(0).toString)
    }
    Harness.printTable(
      "Table 3 (repro scale)",
      Seq("network", "|V|", "|E|", "labels", "k_max", "d_max"),
      rows)
    spark.stop()
  }
}
