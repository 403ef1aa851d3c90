package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.GraphGen
import repro.gthinker._
import repro.predict.TaskFeatures

/** spark-submit entrypoint for Tables 1–2: per-task features, serial mining
  * time, and the (failing) regression prediction on the straggler datasets.
  * Usage: Table01_02_TaskTimes [YouTube|Patent]
  */
object Table01_02_TaskTimes {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("tables-1-2").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val picks = if (args.isEmpty) Seq(("YouTube", None), ("Patent", Some(0.89)))
                else args.toSeq.map(a => (a, if (a.startsWith("Patent")) Some(0.89) else None))
    for ((prefix, gammaOv) <- picks) {
      val d = GraphGen.all().find(_.name.startsWith(prefix)).get
      val gamma = gammaOv.getOrElse(d.gamma)
      val res = Engine.run(spark.sparkContext, d.graph, gamma, d.tauSize, ABase,
        EngineConfig(16, recordTaskStats = true))
      val preds = TaskFeatures.fitPredict(res.taskStats)
      println(s"\n${d.name} (gamma=$gamma): 10 most expensive of ${res.taskStats.size} tasks")
      println(f"${"|V|"}%7s ${"|E|"}%9s ${"MaxDeg"}%7s ${"|E|/|V|"}%8s ${"Core#"}%6s ${"Time(ms)"}%11s ${"Pred(ms)"}%11s")
      res.taskStats.zip(preds).sortBy(_._1.mineNanos).takeRight(10).foreach { case (s, p) =>
        println(f"${s.nV}%7d ${s.nE}%9d ${s.maxDeg}%7d ${s.avgDeg}%8.2f ${s.coreNum}%6d ${s.mineNanos / 1e6}%11.1f $p%11.1f")
      }
    }
    spark.stop()
  }
}
