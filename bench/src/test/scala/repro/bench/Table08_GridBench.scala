package repro.bench

import repro.gthinker._

/** Table 8: the (τ_split, τ_time) grid for A_time on the two straggler
  * graphs. Values are scaled down (~1/50) from the paper's since our graphs
  * are smaller; the observations reproduced: τ_time has a sweet spot, and
  * the answer is invariant across all cells.
  */
class Table08_GridBench extends BenchSpec {

  private def grid(prefix: String, splits: Seq[Int], times: Seq[Double]): Unit = {
    val d = Datasets(prefix)
    table(s"Table 8: A_time running time (s) on ${d.name} — rows tau_time, cols tau_split")
    row(f"${"Ttime\\Tsplit"}%14s " + splits.map(s => f"$s%8d").mkString)
    var maximals = Set.empty[Int]
    for (tt <- times) {
      val cells = splits.map { ts =>
        val r = Engine.run(sc, d.graph, d.gamma, d.tauSize, ATime(tt), EngineConfig(16, tauSplit = ts))
        maximals += r.numMaximal
        r.wallMillis
      }
      row(f"${tt / 1000}%12.3fs " + cells.map(c => f"${sec(c)}%8s").mkString)
    }
    assert(maximals.size == 1, s"$prefix: answers must be invariant across the grid, got $maximals")
  }

  test("Table 8(b): Patent-like grid") {
    grid("Patent", Seq(1000, 200, 50), Seq(1000.0, 100.0, 10.0, 1.0))
  }

  test("Table 8(a): YouTube-like grid") {
    grid("YouTube", Seq(500, 50), Seq(100.0, 10.0, 1.0))
  }
}
