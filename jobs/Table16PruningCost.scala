package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.{PhaseTimers, QuickPlus}
import repro.graph.GraphGen

/** spark-submit entrypoint for Table 16: per-phase pruning cost of Quick+. */
object Table16PruningCost {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master("local[*]").appName("table16").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val sets = if (args.isEmpty) Seq("GSE1730", "GSE10158", "CaGrQc", "Enron", "Amazon", "Hyves") else args.toSeq
    println(f"${"Data"}%-15s ${"Lookahead"}%10s ${"Cover"}%10s ${"Critical"}%10s ${"LB&UB"}%10s  (ms)")
    for (p <- sets) {
      val d = GraphGen.all().find(_.name.startsWith(p)).get
      val t = new PhaseTimers
      QuickPlus.mineSerial(d.graph, d.gamma, d.tauSize, timers = t)
      println(f"${d.name}%-15s ${t.lookaheadNs / 1e6}%10.2f ${t.coverNs / 1e6}%10.2f ${t.criticalNs / 1e6}%10.2f ${t.boundNs / 1e6}%10.2f")
    }
    spark.stop()
  }
}
