package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.baselines.{EmbedExpand, GThinkerApps, SqlJoin}
import repro.graph.GraphGen

/** spark-submit entrypoint for Table 4: TC / MCF / GM across the dataflow
  * baselines and the task engine (old and redesigned scheduling).
  */
object Table04Systems {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("table4").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val sc = spark.sparkContext
    def d(p: String) = GraphGen.all().find(_.name.startsWith(p)).get.graph
    println("workload dataset  EmbedExpand(s)  SqlJoin(s)  G-thinker(s)  G-thinker+(s)  value")
    for (p <- Seq("Enron", "Hyves", "YouTube")) {
      val g = d(p)
      val e = EmbedExpand.triangleCount(sc, g, 16); val s = SqlJoin.triangleCount(spark, g)
      val o = GThinkerApps.triangleCount(sc, g, 16, prioritizeBig = false)
      val n = GThinkerApps.triangleCount(sc, g, 16)
      println(f"TC  $p%-10s ${e.millis / 1000}%8.2f ${s.millis / 1000}%8.2f ${o.millis / 1000}%8.2f ${n.millis / 1000}%8.2f ${n.value}%12d")
    }
    for (p <- Seq("Enron", "Hyves", "YouTube")) {
      val g = d(p)
      val o = GThinkerApps.maxClique(sc, g, 16, prioritizeBig = false)
      val n = GThinkerApps.maxClique(sc, g, 16)
      val e = EmbedExpand.maxClique(sc, g, 16, 5000000L) match {
        case Right(r) => f"${r.millis / 1000}%.2f"; case Left(_) => "X"
      }
      println(f"MCF $p%-10s $e%8s ${"-"}%8s ${o.millis / 1000}%8.2f ${n.millis / 1000}%8.2f ${n.value}%12d")
    }
    for (p <- Seq("Enron", "Amazon", "Hyves")) {
      val g = d(p)
      val e = EmbedExpand.fourCliqueCount(sc, g, 16); val s = SqlJoin.fourCliqueCount(spark, g)
      val o = GThinkerApps.fourCliqueCount(sc, g, 16, prioritizeBig = false)
      val n = GThinkerApps.fourCliqueCount(sc, g, 16)
      println(f"GM  $p%-10s ${e.millis / 1000}%8.2f ${s.millis / 1000}%8.2f ${o.millis / 1000}%8.2f ${n.millis / 1000}%8.2f ${n.value}%12d")
    }
    spark.stop()
  }
}
