package repro.gthinker

import repro.SparkSpec
import repro.core.{QuickPlus, BruteForce}
import repro.graph.GraphGen

/** The engine must produce exactly the serial Quick+ maximal result set, for
  * every mode (A_base / A_split / A_time), engine variant (old/new), and
  * parallelism — decomposition and scheduling may never change the answer.
  */
class EngineSpec extends SparkSpec {

  private def canonSet(rs: Seq[Array[Int]]): Set[Vector[Int]] = rs.map(_.toVector).toSet

  private def serialTruth(g: repro.graph.LocalGraph, gamma: Double, tau: Int): Set[Vector[Int]] =
    canonSet(QuickPlus.mineSerial(g, gamma, tau).maximal)

  for {
    (mode, label) <- Seq[(Mode, String)](
      (ABase, "A_base"), (ASplit(8), "A_split(8)"), (ASplit(2), "A_split(2)"),
      (ATime(0.0), "A_time(0ms)"), (ATime(50.0), "A_time(50ms)"))
    prioritize <- Seq(true, false)
    par        <- Seq(1, 4)
  } test(s"engine == serial Quick+ [$label, prioritize=$prioritize, p=$par]") {
    for (seed <- Seq(11, 12)) {
      val g = GraphGen.erdosRenyi(40, 0.30, seed)
      val truth = serialTruth(g, 0.7, 5)
      val res = Engine.run(spark.sparkContext, g, 0.7, 5, mode,
        EngineConfig(parallelism = par, prioritizeBigTasks = prioritize, tauSplit = 8))
      assert(canonSet(res.maximal) == truth,
        s"seed=$seed missing=${(truth -- canonSet(res.maximal)).take(3)} extra=${(canonSet(res.maximal) -- truth).take(3)}")
    }
  }

  test("engine matches brute force on a tiny graph") {
    val g = GraphGen.erdosRenyi(12, 0.6, 5)
    val truth = canonSet(BruteForce.allMaximal(g, 0.75, 4))
    for (mode <- Seq[Mode](ABase, ASplit(3), ATime(0.0))) {
      val res = Engine.run(spark.sparkContext, g, 0.75, 4, mode, EngineConfig(parallelism = 2, tauSplit = 3))
      assert(canonSet(res.maximal) == truth, s"mode=$mode")
    }
  }

  test("A_split and A_time actually decompose tasks (subtasks spawned)") {
    val g = GraphGen.erdosRenyi(50, 0.4, 3)
    val split = Engine.run(spark.sparkContext, g, 0.6, 5, ASplit(5), EngineConfig(2, tauSplit = 5))
    assert(split.subtasksSpawned > 0, "A_split with tiny tau_split must decompose")
    assert(split.rounds > 1)
    val time = Engine.run(spark.sparkContext, g, 0.6, 5, ATime(0.0), EngineConfig(2, tauSplit = 5))
    assert(time.subtasksSpawned > 0, "A_time with zero budget must decompose")
  }

  test("A_base never decomposes and finishes in one round") {
    val g = GraphGen.erdosRenyi(40, 0.3, 7)
    val res = Engine.run(spark.sparkContext, g, 0.7, 5, ABase, EngineConfig(4))
    assert(res.subtasksSpawned == 0)
    assert(res.rounds == 1)
  }

  test("metrics are sane: mining time positive, tasks processed >= spawned vertices surviving") {
    val g = GraphGen.erdosRenyi(40, 0.35, 9)
    val res = Engine.run(spark.sparkContext, g, 0.7, 5, ATime(1.0), EngineConfig(4))
    assert(res.tasksProcessed > 0)
    assert(res.miningMillis >= 0.0)
    assert(res.materializeMillis > 0.0)
    assert(res.maxTaskMillis <= res.miningMillis + 1e-6)
  }

  test("recordTaskStats yields one record per processed task with features") {
    val g = GraphGen.erdosRenyi(40, 0.35, 9)
    val res = Engine.run(spark.sparkContext, g, 0.7, 5, ABase, EngineConfig(4, recordTaskStats = true))
    assert(res.taskStats.nonEmpty)
    assert(res.taskStats.size == res.tasksProcessed)
    res.taskStats.foreach { s =>
      assert(s.nV >= 1); assert(s.mineNanos >= 0); assert(s.coreNum >= 0)
    }
  }

  test("empty after k-core: engine returns no results quickly") {
    val g = GraphGen.erdosRenyi(30, 0.05, 1) // sparse: 5-core empty
    val res = Engine.run(spark.sparkContext, g, 0.9, 8, ABase, EngineConfig(2))
    assert(res.maximal.isEmpty)
  }
}
