package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.GraphGen
import repro.gthinker.{ATime, EngineConfig}
import repro.kernel.KernelExpand

/** spark-submit entrypoint for Table 11: clique-kernel expansion on the
  * G-thinker engine. Usage: Table11KernelEngine [a|b|c]
  */
object Table11KernelEngine {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("table11").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val d = GraphGen.all().find(_.name.startsWith("YouTube")).get
    def run(tau: Int, gamma: Double, k: Int) = {
      val kernels = KernelExpand.topKCliqueKernels(d.graph, k, coreK = d.k)
      KernelExpand.expandOnEngine(spark.sparkContext, d.graph, kernels, gamma, tau,
        ATime(100.0), EngineConfig(16, tauSplit = 50), k = math.max(k, 100))
    }
    val part = args.headOption.getOrElse("abc")
    if (part.contains("a")) for (tau <- Seq(20, 19, 18, 17)) {
      val r = run(tau, 0.9, 1)
      println(f"(a) tau=$tau gamma=0.90 k=1: time=${r.millis / 1000}%8.2fs results=${r.numResults}%6d maximal=${r.numMaximal}%6d")
    }
    if (part.contains("b")) for (g <- Seq(0.9, 0.85)) {
      val r = run(18, g, 1)
      println(f"(b) tau=18 gamma=$g%4.2f k=1: time=${r.millis / 1000}%8.2fs results=${r.numResults}%6d maximal=${r.numMaximal}%6d")
    }
    if (part.contains("c")) for (k <- Seq(1, 2, 4)) {
      val r = run(20, 0.9, k)
      println(f"(c) tau=20 gamma=0.90 k=$k: time=${r.millis / 1000}%8.2fs results=${r.numResults}%6d maximal=${r.numMaximal}%6d")
    }
    spark.stop()
  }
}
