package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.GraphGen
import repro.gthinker.{ABase, Engine, EngineConfig}
import repro.kernel.KernelExpand

/** spark-submit entrypoint for Table 9: the serial kernel-expansion baseline
  * of Sanei-Mehri et al. [31] vs exact A_base.
  */
object Table09Kernel {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("table9").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val rows = Seq(("GSE1730", 0.95), ("GSE10158", 0.85), ("CaGrQc", 0.85),
                   ("Enron", 0.95), ("Amazon", 0.55), ("Hyves", 0.95))
    println(f"${"Data"}%-15s ${"g'"}%5s ${"k'"}%4s ${"k"}%4s ${"Kernel(s)"}%10s ${"#Res"}%6s ${"A_base(s)"}%10s")
    for ((p, gp) <- rows) {
      val d = GraphGen.all().find(_.name.startsWith(p)).get
      val kern = KernelExpand.topKSerial(d.graph, gp, 30, d.gamma, 10, d.tauSize)
      val base = Engine.run(spark.sparkContext, d.graph, d.gamma, d.tauSize, ABase, EngineConfig(16))
      println(f"${d.name}%-15s $gp%5.2f ${30}%4d ${10}%4d ${kern.millis / 1000}%10.2f ${kern.topK.size}%6d ${base.wallMillis / 1000}%10.2f")
    }
    spark.stop()
  }
}
