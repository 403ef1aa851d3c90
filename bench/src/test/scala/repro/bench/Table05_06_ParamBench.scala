package repro.bench

import repro.gthinker._

/** Tables 5 and 6: sensitivity of the result count (and time) to small
  * perturbations of γ and τ_size. The paper's claim — counts change
  * steeply under small parameter changes — must hold on the analogues.
  * (The paper timed A_base; we use A_time for the sweeps to keep the bench
  * affordable and note it in EXPERIMENTS.md — the counts are identical.)
  */
class Table05_06_ParamBench extends BenchSpec {

  private def runOne(prefix: String, gamma: Double, tau: Int): EngineResult =
    Engine.run(sc, Datasets(prefix).graph, gamma, tau, ATime(100.0),
      EngineConfig(16, tauSplit = 50))

  test("Table 5: effect of gamma") {
    table("Table 5: effect of gamma — Time (s) | #Results | #Maximal")
    val sweeps = Seq(
      ("Patent", 20, Seq(0.91, 0.90, 0.89)),
      ("Hyves", 22, Seq(0.92, 0.91, 0.90, 0.89, 0.88, 0.87, 0.86)),
      ("Enron", 23, Seq(0.92, 0.91, 0.90, 0.89, 0.88, 0.87)))
    for ((prefix, tau, gammas) <- sweeps) {
      val counts = gammas.map { g =>
        val r = runOne(prefix, g, tau)
        row(f"${prefix}%-8s tau=$tau gamma=$g%5.2f  time=${sec(r.wallMillis)}%8s  results=${r.numCandidates}%8d  maximal=${r.numMaximal}%8d")
        r.numMaximal
      }
      // steep growth: the smallest gamma yields far more results than the largest
      assert(counts.last > counts.head,
        s"$prefix: result count should grow as gamma decreases (${counts.head} -> ${counts.last})")
    }
  }

  test("Table 6: effect of tau_size") {
    table("Table 6: effect of tau_size — Time (s) | #Results | #Maximal")
    val sweeps = Seq(
      ("Patent", 0.9, Seq(22, 21, 20, 19, 18, 17)),
      ("Hyves", 0.9, Seq(23, 22, 21)),
      ("Enron", 0.9, Seq(25, 24, 23, 22, 21)))
    for ((prefix, gamma, taus) <- sweeps) {
      val counts = taus.map { t =>
        val r = runOne(prefix, gamma, t)
        row(f"${prefix}%-8s tau=$t%2d gamma=$gamma%4.2f  time=${sec(r.wallMillis)}%8s  results=${r.numCandidates}%8d  maximal=${r.numMaximal}%8d")
        r.numMaximal
      }
      assert(counts.last > counts.head,
        s"$prefix: result count should grow as tau_size decreases (${counts.head} -> ${counts.last})")
    }
  }
}
