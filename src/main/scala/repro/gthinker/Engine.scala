package repro.gthinker

import org.apache.spark.SparkContext
import org.apache.spark.rdd.RDD
import org.apache.spark.util.AccumulatorV2
import repro.core._
import repro.graph.{GraphOps, LocalGraph}
import scala.collection.mutable.ArrayBuffer

/** A mining task ⟨S, ext(S)⟩ in ids of the engine's (k-core-pruned, recoded)
  * global graph. The task's subgraph is the one induced by s ++ ext; it is
  * materialized from the broadcast graph when the task is executed, and that
  * materialization time is metered separately (Tables 12–14).
  */
final case class QCTask(root: Int, s: Array[Int], ext: Array[Int]) {
  def extSize: Int = ext.length
}

/** Per-task record for the straggler study of Tables 1–2. */
final case class TaskStat(root: Int, nV: Int, nE: Long, maxDeg: Int,
                          avgDeg: Double, coreNum: Int, mineNanos: Long)

/** The three algorithm variants of Section 8. */
sealed trait Mode extends Serializable
/** Mine each spawned task's set-enumeration subtree fully in serial. */
case object ABase extends Mode
/** Decompose while ext(S) is larger than τ_split (Algorithm 8). */
final case class ASplit(tauSplit: Int) extends Mode
/** Mine for τ_time, then wrap remaining branches as subtasks (Algs 9–10). */
final case class ATime(tauTimeMillis: Double) extends Mode

/** Engine knobs. `prioritizeBigTasks=false` emulates the ORIGINAL G-thinker
  * engine (per-thread local queues only: subtasks stay hashed to their
  * spawning worker, no big-task-first ordering); `true` is the paper's
  * redesign (global big-task queue + stealing ≈ sort big tasks first and
  * round-robin them across workers each round).
  */
final case class EngineConfig(
    parallelism: Int,
    prioritizeBigTasks: Boolean = true,
    tauSplit: Int = 100,
    recode: Boolean = true,
    recordTaskStats: Boolean = false,
    minerConfig: MinerConfig = MinerConfig.quickPlus)

final case class EngineResult(
    maximal: Seq[Array[Int]],
    numCandidates: Long,
    wallMillis: Double,
    postMillis: Double,
    rounds: Int,
    tasksProcessed: Long,
    subtasksSpawned: Long,
    miningMillis: Double,
    materializeMillis: Double,
    maxTaskMillis: Double,
    taskStats: Seq[TaskStat],
    peakHeapMB: Long) {
  def numMaximal: Int = maximal.size
}

/** Accumulator tracking the maximum of longs (longest task). */
final class MaxAccumulator extends AccumulatorV2[Long, Long] {
  private var v: Long = 0L
  override def isZero: Boolean = v == 0L
  override def copy(): MaxAccumulator = { val a = new MaxAccumulator; a.v = v; a }
  override def reset(): Unit = v = 0L
  override def add(x: Long): Unit = if (x > v) v = x
  override def merge(o: AccumulatorV2[Long, Long]): Unit = if (o.value > v) v = o.value
  override def value: Long = v
}

private sealed trait Emit extends Serializable
private final case class EmitResult(vs: Array[Int]) extends Emit
private final case class EmitTask(t: QCTask) extends Emit
private final case class EmitStat(s: TaskStat) extends Emit

/** The redesigned G-thinker execution engine on Spark.
  *
  * One Spark round = every worker drains its task list once. Between rounds
  * the driver re-places tasks: with big-task prioritization, tasks with
  * |ext| >= τ_split are sorted descending and dealt round-robin over the
  * `parallelism` workers (global queue + stealing), the rest follow; the
  * old engine hashes tasks to their spawning worker in arrival order.
  */
object Engine {

  /** Full job: k-core prune, recode, spawn per-vertex ego tasks, mine. */
  def run(sc: SparkContext, g: LocalGraph, gamma: Double, tauSize: Int,
          mode: Mode, conf: EngineConfig): EngineResult = {
    val wall0 = System.nanoTime
    val k = QuasiClique.ceilGamma(gamma, tauSize - 1)
    val (gK, idsK) = GraphOps.kCoreSubgraph(g, k)
    val (gm, ids) =
      if (conf.recode && gK.n > 0) {
        val (g2, ids2) = GraphOps.recodeByCover(gK)
        (g2, ids2.map(idsK))
      } else (gK, idsK)

    if (gm.n == 0)
      return EngineResult(Nil, 0, (System.nanoTime - wall0) / 1e6, 0.0, 0, 0, 0, 0, 0, 0, Nil, usedHeapMB())

    val bc = sc.broadcast(gm)
    val acc = Accs(sc)
    val spawnUpper = if (conf.recode) gm.n - gm.degree(0) else gm.n
    val p = math.max(1, conf.parallelism)
    val matAcc = acc.mat

    // ---- round 0: spawn per-vertex ego tasks (Algorithms 4, 6, 7) ----
    val tasks0: Array[QCTask] = sc.parallelize(0 until spawnUpper, p).mapPartitions { it =>
      val graph = bc.value
      it.flatMap { v =>
        val t0 = System.nanoTime
        val built = TaskSpawn.egoTask(graph, v, k).map { case (core, coreIds) =>
          QCTask(v, Array(v), coreIds.drop(1))
        }
        matAcc.add(System.nanoTime - t0)
        built
      }
    }.collect()

    val res = mineLoop(sc, bc, acc, ids, tasks0, gamma, tauSize, mode, conf, wall0)
    bc.destroy()
    res
  }

  /** Kernel-expansion entry (Tables 9, 11): initial tasks are given directly
    * (S = kernel, ext = its candidate pool), in ids of `gm`, whose vertex v
    * maps to original id `ids(v)`. No recoding, no per-vertex spawning.
    */
  def runFromTasks(sc: SparkContext, gm: LocalGraph, ids: Array[Int],
                   tasks0: Array[QCTask], gamma: Double, tauSize: Int,
                   mode: Mode, conf: EngineConfig): EngineResult = {
    val wall0 = System.nanoTime
    if (gm.n == 0 || tasks0.isEmpty)
      return EngineResult(Nil, 0, (System.nanoTime - wall0) / 1e6, 0.0, 0, 0, 0, 0, 0, 0, Nil, usedHeapMB())
    val bc  = sc.broadcast(gm)
    val acc = Accs(sc)
    val res = mineLoop(sc, bc, acc, ids, tasks0, gamma, tauSize, mode, conf, wall0)
    bc.destroy()
    res
  }

  private final case class Accs(
      mine: org.apache.spark.util.LongAccumulator,
      mat: org.apache.spark.util.LongAccumulator,
      proc: org.apache.spark.util.LongAccumulator,
      spawned: org.apache.spark.util.LongAccumulator,
      max: MaxAccumulator)

  private object Accs {
    def apply(sc: SparkContext): Accs = {
      val m = new MaxAccumulator
      sc.register(m, "maxTaskNs")
      Accs(sc.longAccumulator("miningNs"), sc.longAccumulator("materializeNs"),
        sc.longAccumulator("tasksProcessed"), sc.longAccumulator("subtasksSpawned"), m)
    }
  }

  private def mineLoop(sc: SparkContext,
                       bc: org.apache.spark.broadcast.Broadcast[LocalGraph],
                       acc: Accs, ids: Array[Int], tasks0: Array[QCTask],
                       gamma: Double, tauSize: Int, mode: Mode,
                       conf: EngineConfig, wall0: Long): EngineResult = {
    val p = math.max(1, conf.parallelism)
    val results = ArrayBuffer.empty[Array[Int]]
    val stats   = ArrayBuffer.empty[TaskStat]
    var rounds  = 0
    var peakHeap = usedHeapMB()
    var tasks = tasks0
    val mineAcc = acc.mine; val matAcc = acc.mat
    val procAcc = acc.proc; val spawnAcc = acc.spawned; val maxAcc = acc.max
    val gammaL = gamma; val tauSizeL = tauSize; val confL = conf; val modeL = mode

    while (tasks.nonEmpty) {
      rounds += 1
      val placed = place(sc, tasks, p, confL)
      val emitted = placed.mapPartitions { it =>
        val graph = bc.value
        val out = ArrayBuffer.empty[Emit]
        it.foreach { t =>
          val m0 = System.nanoTime
          val verts = new Array[Int](t.s.length + t.ext.length)
          System.arraycopy(t.s, 0, verts, 0, t.s.length)
          System.arraycopy(t.ext, 0, verts, t.s.length, t.ext.length)
          val (sub, oldIds) = GraphOps.induced(graph, verts)
          matAcc.add(System.nanoTime - m0)
          if (confL.recordTaskStats) {
            val f = GraphOps.features(sub)
            out += EmitStat(TaskStat(t.root, f.nV, f.nE, f.maxDeg, f.avgDeg, f.coreNum, 0L))
          }
          val statIdx = out.length - 1
          val t1 = System.nanoTime
          val sink = (arr: Array[Int]) => {
            out += EmitResult(QuasiClique.canon(arr.map(oldIds))); ()
          }
          val spawnChild = (s: Array[Int], e: Array[Int]) => {
            spawnAcc.add(1)
            out += EmitTask(QCTask(t.root, s.map(oldIds), e.map(oldIds))); ()
          }
          val miner = new Miner(sub, gammaL, tauSizeL, sink, confL.minerConfig)
          val sBuf = ArrayBuffer.from(0 until t.s.length)
          val eBuf = ArrayBuffer.from(t.s.length until verts.length)
          modeL match {
            case ABase => miner.recursiveMine(sBuf, eBuf)
            case ASplit(ts) =>
              if (eBuf.length <= ts) miner.recursiveMine(sBuf, eBuf)
              else miner.decomposeOneLevel(sBuf, eBuf, spawnChild)
            case ATime(ms) =>
              miner.timeDelayed(sBuf, eBuf, t1, (ms * 1e6).toLong, spawnChild)
          }
          val dt = System.nanoTime - t1
          mineAcc.add(dt); maxAcc.add(dt); procAcc.add(1)
          if (confL.recordTaskStats) out(statIdx) match {
            case EmitStat(s0) => out(statIdx) = EmitStat(s0.copy(mineNanos = dt))
            case _            => ()
          }
        }
        out.iterator
      }.collect()

      val next = ArrayBuffer.empty[QCTask]
      emitted.foreach {
        case EmitResult(vs) => results += vs
        case EmitTask(t)    => next += t
        case EmitStat(s)    => stats += s
      }
      tasks = next.toArray
      peakHeap = math.max(peakHeap, usedHeapMB())
    }

    val wall1 = System.nanoTime
    // map results back to the original vertex ids, then post-process
    val mapped  = results.map(vs => QuasiClique.canon(vs.map(ids))).toSeq
    val maximal = Maximality.filterMaximal(mapped)
    val wall2 = System.nanoTime

    EngineResult(
      maximal, results.length.toLong, (wall1 - wall0) / 1e6, (wall2 - wall1) / 1e6,
      rounds, procAcc.value, spawnAcc.value,
      mineAcc.value / 1e6, matAcc.value / 1e6, maxAcc.value / 1e6,
      stats.toSeq, peakHeap)
  }

  /** Place tasks on `p` workers for the next round. */
  private def place(sc: SparkContext, tasks: Array[QCTask], p: Int, conf: EngineConfig): RDD[QCTask] = {
    val buckets = Array.fill(p)(ArrayBuffer.empty[QCTask])
    if (conf.prioritizeBigTasks) {
      // redesigned engine: big tasks first, dealt round-robin (global queue
      // + stealing); small tasks follow round-robin in arrival order.
      val (big, small) = tasks.partition(_.extSize >= conf.tauSplit)
      val ordered = big.sortBy(-_.extSize) ++ small
      var i = 0
      while (i < ordered.length) { buckets(i % p) += ordered(i); i += 1 }
    } else {
      // original engine: tasks stay with the worker that owns their spawning
      // vertex, processed FIFO — no prioritization, no stealing.
      var i = 0
      while (i < tasks.length) { buckets(tasks(i).root % p) += tasks(i); i += 1 }
    }
    // key i lands exactly in partition i under HashPartitioner(p) for 0<=i<p
    val keyed = buckets.zipWithIndex.flatMap { case (b, i) => b.map(t => (i, t)) }.toSeq
    sc.parallelize(keyed, p)
      .partitionBy(new org.apache.spark.HashPartitioner(p))
      .values
  }

  private def usedHeapMB(): Long = {
    val rt = Runtime.getRuntime
    (rt.totalMemory() - rt.freeMemory()) / (1024 * 1024)
  }
}
