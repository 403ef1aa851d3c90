package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.GraphGen
import repro.gthinker._

/** spark-submit entrypoint for Table 8: the (tau_split, tau_time) grid of
  * A_time. Usage: Table08Grid <datasetPrefix> [splits=1000,200,50] [timesMs=1000,100,10,1]
  */
object Table08Grid {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("table8").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val d = GraphGen.all().find(_.name.startsWith(args.headOption.getOrElse("Patent"))).get
    val splits = args.lift(1).getOrElse("1000,200,50").split(",").map(_.toInt).toSeq
    val times  = args.lift(2).getOrElse("1000,100,10,1").split(",").map(_.toDouble).toSeq
    println(s"${d.name}: A_time time (s); rows tau_time (ms), cols tau_split")
    println(f"${"t_time\\t_split"}%14s " + splits.map(s => f"$s%9d").mkString)
    for (tt <- times) {
      val cells = splits.map { ts =>
        Engine.run(spark.sparkContext, d.graph, d.gamma, d.tauSize, ATime(tt), EngineConfig(16, tauSplit = ts)).wallMillis
      }
      println(f"$tt%12.1fms " + cells.map(c => f"${c / 1000}%9.2f").mkString)
    }
    spark.stop()
  }
}
