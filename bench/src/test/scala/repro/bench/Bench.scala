package repro.bench

import repro.SparkSpec
import repro.graph.GraphGen

/** Shared bench infrastructure. Datasets are generated once per bench JVM
  * (all bench suites run in one forked JVM, sequentially).
  */
object Datasets {
  lazy val all: Seq[GraphGen.Dataset] = GraphGen.all()
  def apply(prefix: String): GraphGen.Dataset =
    all.find(_.name.startsWith(prefix)).getOrElse(sys.error(s"no dataset matching '$prefix'"))
}

/** Base for the per-table bench suites: SparkSession + row printing. Output
  * is plain stdout so `sbt "bench/test" | tee bench_output.txt` captures the
  * paper-style tables.
  */
trait BenchSpec extends SparkSpec {
  def sc = spark.sparkContext

  def table(title: String): Unit = { println(); println(s"==== $title ===="); }
  def row(s: String): Unit = println(s)
  def sec(ms: Double): String = f"${ms / 1000.0}%.2f"
  def gb(mb: Long): String = f"${mb / 1024.0}%.2f"
}
