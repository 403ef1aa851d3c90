package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.GraphGen
import repro.gthinker._

/** spark-submit entrypoint for Table 10: A_time scalability over engine
  * workers. Usage: Table10Scalability [datasetPrefix] [workers=1,2,4,8,16]
  */
object Table10Scalability {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("table10").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val d = GraphGen.all().find(_.name.startsWith(args.headOption.getOrElse("Patent"))).get
    val workers = args.lift(1).getOrElse("1,2,4,8,16").split(",").map(_.toInt).toSeq
    println(s"${d.name}: A_time(100ms, tau_split=50)")
    for (p <- workers) {
      val r = Engine.run(spark.sparkContext, d.graph, d.gamma, d.tauSize, ATime(100.0),
        EngineConfig(parallelism = p, tauSplit = 50))
      println(f"workers=$p%2d time=${r.wallMillis / 1000}%8.2fs rounds=${r.rounds}%3d tasks=${r.tasksProcessed}%6d maximal=${r.numMaximal}")
    }
    spark.stop()
  }
}
