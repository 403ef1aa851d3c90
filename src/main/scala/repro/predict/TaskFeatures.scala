package repro.predict

import repro.gthinker.TaskStat

/** Feature extraction for the task-time regression of Tables 1–2: the
  * size/degree/core features of the task subgraph (the paper also used the
  * top-10 degrees and core indices; our subgraphs are smaller, so the five
  * headline features plus simple interactions suffice to make the same
  * point — the model still cannot see the stragglers).
  */
object TaskFeatures {

  def vector(s: TaskStat): Array[Double] = Array(
    s.nV.toDouble,
    s.nE.toDouble,
    s.maxDeg.toDouble,
    s.avgDeg,
    s.coreNum.toDouble,
    math.log1p(s.nV.toDouble),
    math.log1p(s.nE.toDouble),
    s.coreNum.toDouble * s.avgDeg)

  /** Fit on (features -> mining millis) and return per-task predictions.
    * Training is capped at `maxTrain` tasks (largest-first by mining time is
    * NOT used — sampling is uniform by index stride — so the model has the
    * same information the paper's SVR had).
    */
  def fitPredict(stats: Seq[TaskStat], lambda: Double = 1.0, sigma: Double = 2.0,
                 maxTrain: Int = 1200): Seq[Double] = {
    val xs = stats.map(vector).toArray
    val ys = stats.map(_.mineNanos / 1e6).toArray
    val idx =
      if (xs.length <= maxTrain) xs.indices.toArray
      else {
        val stride = xs.length.toDouble / maxTrain
        (0 until maxTrain).map(i => (i * stride).toInt).distinct.toArray
      }
    val model = new KernelRidge(lambda, sigma).fit(idx.map(xs), idx.map(ys))
    xs.map(model.predict).toSeq
  }
}
