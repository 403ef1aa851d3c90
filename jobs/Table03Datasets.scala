package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.SynthData
import repro.graph.{GraphGen, GraphOps}

/** spark-submit entrypoint for Table 3: dataset statistics before (a) and
  * after (b) k-core pruning, computed through the DataFrame API.
  */
object Table03Datasets {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("table3").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    println(f"${"Data"}%-15s ${"|V|"}%9s ${"|E|"}%10s ${"|E|/|V|"}%8s ${"MaxDeg"}%7s | ${"Tsize"}%5s ${"gamma"}%5s ${"k"}%3s ${"core|V|"}%8s ${"core|E|"}%9s")
    for (d <- GraphGen.all()) {
      val stats = SynthData.graphStats(spark, SynthData.graphEdges(spark, d.graph)).head
      val (core, _) = GraphOps.kCoreSubgraph(d.graph, d.k)
      println(f"${d.name}%-15s ${d.graph.n}%9d ${stats.getDouble(1).toLong}%10d ${d.graph.avgDegree / 2}%8.2f ${stats.getLong(2)}%7d | " +
        f"${d.tauSize}%5d ${d.gamma}%5.2f ${d.k}%3d ${core.n}%8d ${core.numEdges}%9d")
    }
    spark.stop()
  }
}
