package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.GraphGen
import repro.gthinker._

/** spark-submit entrypoint for Tables 5–6: sensitivity to gamma / tau_size.
  * Usage: Table05_06_Params <datasetPrefix> gamma <tau> <g1,g2,...>
  *     or Table05_06_Params <datasetPrefix> tau <gamma> <t1,t2,...>
  */
object Table05_06_Params {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("tables-5-6").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val d = GraphGen.all().find(_.name.startsWith(args(0))).get
    args(1) match {
      case "gamma" =>
        val tau = args(2).toInt
        for (g <- args(3).split(",").map(_.toDouble)) {
          val r = Engine.run(spark.sparkContext, d.graph, g, tau, ATime(100.0), EngineConfig(16, tauSplit = 50))
          println(f"${d.name} tau=$tau gamma=$g%5.2f time=${r.wallMillis / 1000}%8.2f results=${r.numCandidates}%8d maximal=${r.numMaximal}%8d")
        }
      case "tau" =>
        val g = args(2).toDouble
        for (tau <- args(3).split(",").map(_.toInt)) {
          val r = Engine.run(spark.sparkContext, d.graph, g, tau, ATime(100.0), EngineConfig(16, tauSplit = 50))
          println(f"${d.name} tau=$tau gamma=$g%5.2f time=${r.wallMillis / 1000}%8.2f results=${r.numCandidates}%8d maximal=${r.numMaximal}%8d")
        }
    }
    spark.stop()
  }
}
