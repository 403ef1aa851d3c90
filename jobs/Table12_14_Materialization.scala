package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.GraphGen
import repro.gthinker._

/** spark-submit entrypoint for Tables 12–14: cumulative mining time vs
  * subgraph materialization time as tau_time varies.
  * Usage: Table12_14_Materialization [datasetPrefix] [timesMs]
  */
object Table12_14_Materialization {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("tables-12-14").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val d = GraphGen.all().find(_.name.startsWith(args.headOption.getOrElse("Patent"))).get
    val times = args.lift(1).getOrElse("5000,1000,100,10,1").split(",").map(_.toDouble).toSeq
    println(s"${d.name}: tau_time | job (s) | total mining (s) | total materialization (s) | ratio")
    for (tt <- times) {
      val r = Engine.run(spark.sparkContext, d.graph, d.gamma, d.tauSize, ATime(tt), EngineConfig(16, tauSplit = 50))
      val ratio = if (r.materializeMillis > 0) f"${r.miningMillis / r.materializeMillis}%.1f" else "inf"
      println(f"tau_time=${tt}%8.1fms job=${r.wallMillis / 1000}%8.2f mine=${r.miningMillis / 1000}%8.2f mat=${r.materializeMillis / 1000}%8.2f ratio=$ratio%10s")
    }
    spark.stop()
  }
}
