package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.{QuasiClique, QuickPlus}
import repro.graph.{GraphGen, GraphOps}
import repro.gthinker._

/** Calibration driver (not a paper table): prints raw and k-core-pruned
  * stats of every synthetic dataset plus engine timings, so bench
  * parameters can be sanity-checked. Run: sbt "jobs/runMain repro.jobs.Calibrate [stats|mine|tasks]"
  */
object Calibrate {
  def main(args: Array[String]): Unit = {
    val phase = args.headOption.getOrElse("stats")
    val spark = SparkSession.builder.master("local[*]").appName("calibrate")
      .config("spark.ui.enabled", false).getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val sc = spark.sparkContext

    phase match {
      case "stats" =>
        println(f"${"name"}%-15s ${"|V|"}%9s ${"|E|"}%10s ${"maxD"}%6s ${"avgD"}%6s | k ${"coreV"}%7s ${"coreE"}%9s ${"coreMaxD"}%8s")
        for (d <- GraphGen.all()) {
          val g = d.graph
          val (gk, _) = GraphOps.kCoreSubgraph(g, d.k)
          println(f"${d.name}%-15s ${g.n}%9d ${g.numEdges}%10d ${g.maxDegree}%6d ${g.avgDegree}%6.2f | ${d.k}%2d ${gk.n}%7d ${gk.numEdges}%9d ${gk.maxDegree}%8d")
        }
      case "mine" =>
        for (name <- args.drop(1)) {
          val d = GraphGen.all().find(_.name.startsWith(name)).get
          val t0 = System.nanoTime
          val res = Engine.run(sc, d.graph, d.gamma, d.tauSize, ATime(100.0), EngineConfig(16, tauSplit = 50))
          println(f"${d.name}: ATime wall=${res.wallMillis / 1000}%.2fs mine=${res.miningMillis / 1000}%.2fs " +
            f"maxTask=${res.maxTaskMillis / 1000}%.3fs tasks=${res.tasksProcessed} rounds=${res.rounds} " +
            f"cand=${res.numCandidates} maximal=${res.numMaximal} total=${(System.nanoTime - t0) / 1e9}%.1fs")
        }
      case "tasks" =>
        for (name <- args.drop(1)) {
          val d = GraphGen.all().find(_.name.startsWith(name)).get
          val res = Engine.run(sc, d.graph, d.gamma, d.tauSize, ABase,
            EngineConfig(16, recordTaskStats = true))
          val top = res.taskStats.sortBy(-_.mineNanos).take(12)
          println(s"${d.name}: wall=${(res.wallMillis / 1000).round}s mine=${(res.miningMillis / 1000).round}s " +
            s"maxTask=${(res.maxTaskMillis / 1000)}s tasks=${res.tasksProcessed} maximal=${res.numMaximal}")
          top.foreach(s => println(f"  |V|=${s.nV}%6d |E|=${s.nE}%8d maxD=${s.maxDeg}%5d avgD=${s.avgDeg}%6.2f core=${s.coreNum}%3d t=${s.mineNanos / 1e6}%10.1f ms"))
        }
      case "sweepGamma" =>
        val d = GraphGen.all().find(_.name.startsWith(args(1))).get
        val tau = args(2).toInt
        for (g <- args(3).split(",").map(_.toDouble)) {
          val t0 = System.nanoTime
          val res = Engine.run(sc, d.graph, g, tau, ATime(100.0), EngineConfig(16, tauSplit = 50))
          println(f"${d.name} gamma=$g tau=$tau: wall=${res.wallMillis / 1000}%.2fs cand=${res.numCandidates} maximal=${res.numMaximal} post=${res.postMillis / 1000}%.2fs total=${(System.nanoTime - t0) / 1e9}%.1f")
        }
      case "sweepTau" =>
        val d = GraphGen.all().find(_.name.startsWith(args(1))).get
        val g = args(2).toDouble
        for (tau <- args(3).split(",").map(_.toInt)) {
          val t0 = System.nanoTime
          val res = Engine.run(sc, d.graph, g, tau, ATime(100.0), EngineConfig(16, tauSplit = 50))
          println(f"${d.name} gamma=$g tau=$tau: wall=${res.wallMillis / 1000}%.2fs cand=${res.numCandidates} maximal=${res.numMaximal} post=${res.postMillis / 1000}%.2fs total=${(System.nanoTime - t0) / 1e9}%.1f")
        }
      case "block" =>
        // probe: mining cost of one ER(size, p) block alone under (gamma, tau)
        val gamma = args(1).toDouble; val tau = args(2).toInt
        for (spec <- args.drop(3)) {
          val Array(szS, pS) = spec.split(":")
          val sz = szS.toInt; val p = pS.toDouble
          for (seed <- Seq(1, 2)) {
            val g = GraphGen.erdosRenyi(sz, p, seed * 31)
            @volatile var out: Option[repro.core.MineOutcome] = None
            val th = new Thread(() => { out = Some(QuickPlus.mineSerial(g, gamma, tau)) })
            th.setDaemon(true)
            val t0 = System.nanoTime
            th.start(); th.join(120000)
            val dt = (System.nanoTime - t0) / 1e9
            out match {
              case Some(o) => println(f"block sz=$sz p=$p seed=$seed: ${o.mineMillis / 1000}%.2fs results=${o.numResults} maximal=${o.numMaximal}")
              case None    => println(f"block sz=$sz p=$p seed=$seed: TIMEOUT >$dt%.0fs")
            }
          }
        }
      case "serial" =>
        for (name <- args.drop(1)) {
          val d = GraphGen.all().find(_.name.startsWith(name)).get
          val out = QuickPlus.mineSerial(d.graph, d.gamma, d.tauSize)
          println(f"${d.name}: serial Quick+ ${out.mineMillis / 1000}%.2fs results=${out.numResults} maximal=${out.numMaximal} post=${out.postMillis}%.1fms")
        }
    }
    spark.stop()
  }
}
