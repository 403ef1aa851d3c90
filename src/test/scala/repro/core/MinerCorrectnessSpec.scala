package repro.core

import repro.SparkSpec
import repro.graph.{GraphGen, LocalGraph}

/** Quick+ must agree exactly with the brute-force enumerator on small random
  * graphs, across γ, τ_size, densities and seeds. This is the definitional
  * correctness test for the whole mining core.
  */
class MinerCorrectnessSpec extends SparkSpec {

  private def canonSet(rs: Seq[Array[Int]]): Set[Vector[Int]] = rs.map(_.toVector).toSet

  private def checkAgainstBruteForce(g: LocalGraph, gamma: Double, tauSize: Int, label: String): Unit = {
    val expected = canonSet(BruteForce.allMaximal(g, gamma, tauSize))
    val got      = canonSet(QuickPlus.mineSerial(g, gamma, tauSize).maximal)
    assert(got == expected,
      s"$label: mismatch\n  missing=${(expected -- got).take(5)}\n  extra=${(got -- expected).take(5)}")
  }

  for {
    n     <- Seq(8, 10, 12)
    p     <- Seq(0.3, 0.5, 0.7)
    gamma <- Seq(0.5, 0.6, 0.75, 0.9, 1.0)
    tau   <- Seq(3, 4)
    seed  <- Seq(1, 2)
  } test(s"Quick+ == brute force (n=$n p=$p gamma=$gamma tau=$tau seed=$seed)") {
    val g = GraphGen.erdosRenyi(n, p, seed * 1000 + n)
    checkAgainstBruteForce(g, gamma, tau, s"ER($n,$p,seed=$seed)")
  }

  test("Quick+ == brute force on denser graphs with larger tau") {
    for (seed <- 1 to 6) {
      val g = GraphGen.erdosRenyi(13, 0.8, seed)
      checkAgainstBruteForce(g, 0.85, 6, s"dense seed=$seed")
    }
  }

  test("Quick+ without recoding gives the same maximal sets") {
    for (seed <- 1 to 4) {
      val g = GraphGen.erdosRenyi(11, 0.6, seed)
      val a = canonSet(QuickPlus.mineSerial(g, 0.7, 4, recode = true).maximal)
      val b = canonSet(QuickPlus.mineSerial(g, 0.7, 4, recode = false).maximal)
      assert(a == b)
    }
  }

  test("Quick is sound (only valid quasi-cliques) but misses results that Quick+ finds") {
    var missedSomewhere = false
    for (seed <- 1 to 8) {
      val g     = GraphGen.erdosRenyi(12, 0.6, 77 + seed)
      val truth = canonSet(BruteForce.allMaximal(g, 0.75, 4))
      val plus  = canonSet(QuickPlus.mineSerial(g, 0.75, 4).maximal)
      val quickOut = Quick.mineSerial(g, 0.75, 4)
      // soundness: every Quick candidate is a valid quasi-clique
      quickOut.candidates.foreach(s => assert(QuasiClique.isQuasiClique(g, s, 0.75)))
      assert(plus == truth, s"seed=$seed Quick+ must be exact")
      // completeness gap: Quick may miss maximal results (paper, Table 15 notes)
      val quickMax = canonSet(quickOut.maximal)
      if ((truth -- quickMax).nonEmpty) missedSomewhere = true
      // Quick never invents a set that is not a valid quasi-clique of the
      // right size; sets it wrongly reports as maximal are exactly those
      // whose true superset it missed.
      (quickMax -- truth).foreach { s =>
        assert(truth.exists(t => s.toSet.subsetOf(t.toSet) && t.size > s.size),
          s"seed=$seed Quick reported $s which is neither maximal nor dominated")
      }
    }
    assert(missedSomewhere, "on this seed batch Quick is expected to miss at least one maximal result")
  }

  test("Figure 1 example: S2 = {a,b,c,d,e} is a maximal 0.6-quasi-clique; S1 is not maximal") {
    val g = GraphGen.figure1
    assert(QuasiClique.isQuasiClique(g, Array(0, 1, 2, 3), 0.6))    // S1 valid
    assert(QuasiClique.isQuasiClique(g, Array(0, 1, 2, 3, 4), 0.6)) // S2 valid
    val maximal = canonSet(QuickPlus.mineSerial(g, 0.6, 4).maximal)
    assert(maximal.contains(Vector(0, 1, 2, 3, 4)))
    assert(!maximal.contains(Vector(0, 1, 2, 3))) // S1 subsumed by S2
  }
}
