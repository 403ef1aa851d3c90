package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.{Quick, QuickPlus}
import repro.graph.GraphGen

/** spark-submit entrypoint reproducing Table 15 (serial Quick+ vs Quick).
  * Usage: Table15Quick [capMillis] [datasetPrefix ...]
  */
object Table15Quick {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master("local[*]").appName("table15").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val cap = args.headOption.map(_.toLong).getOrElse(120000L)
    val picks = if (args.length <= 1) GraphGen.all()
                else args.drop(1).toSeq.map(a => GraphGen.all().find(_.name.startsWith(a)).get)
    println(f"${"Data"}%-15s ${"Quick+ (s)"}%11s ${"Quick (s)"}%10s")
    for (d <- picks) {
      val p = QuickPlus.mineSerial(d.graph, d.gamma, d.tauSize, capMillis = cap)
      val q = Quick.mineSerial(d.graph, d.gamma, d.tauSize, capMillis = cap)
      def cell(o: repro.core.MineOutcome) = if (o.timedOut) f"> ${cap / 1000.0}%.0f" else f"${o.mineMillis / 1000}%.2f"
      println(f"${d.name}%-15s ${cell(p)}%11s ${cell(q)}%10s")
    }
    spark.stop()
  }
}
