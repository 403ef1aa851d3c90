package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GraphGen, LocalGraph}

class QuasiCliqueSpec extends AnyFunSuite {

  test("ceilGamma matches exact rational arithmetic for paper-typical gammas") {
    // compare against BigDecimal-based exact ceiling for the gammas the
    // paper uses, over a range of sizes — this is where naive double
    // arithmetic goes wrong (e.g. ceil(0.9 * 10) must be 9, not 10)
    for (gammaStr <- Seq("0.5", "0.6", "0.75", "0.8", "0.85", "0.86", "0.87", "0.88", "0.89", "0.9", "0.91", "0.92", "0.95", "1.0");
         m <- 0 to 200) {
      val exact = BigDecimal(gammaStr).*(BigDecimal(m)).setScale(0, BigDecimal.RoundingMode.CEILING).toInt
      assert(QuasiClique.ceilGamma(gammaStr.toDouble, m) == exact, s"gamma=$gammaStr m=$m")
    }
  }

  test("floorDiv matches exact rational arithmetic") {
    for (gammaStr <- Seq("0.5", "0.8", "0.89", "0.9", "1.0"); x <- 0 to 100) {
      val exact = (BigDecimal(x) / BigDecimal(gammaStr)).setScale(0, BigDecimal.RoundingMode.FLOOR).toInt
      assert(QuasiClique.floorDiv(x.toDouble, gammaStr.toDouble) == exact, s"gamma=$gammaStr x=$x")
    }
  }

  test("isQuasiClique: degree threshold boundary") {
    // 5 vertices; gamma=0.5 needs ceil(0.5*4)=2 neighbors each
    val ok = LocalGraph.fromPairs(5, Seq(0 -> 1, 1 -> 2, 2 -> 3, 3 -> 4, 4 -> 0))
    assert(QuasiClique.isQuasiClique(ok, Array(0, 1, 2, 3, 4), 0.5))
    assert(!QuasiClique.isQuasiClique(ok, Array(0, 1, 2, 3, 4), 0.6)) // needs 3
  }

  test("isQuasiClique: disconnected set is rejected even if degrees pass") {
    // two disjoint triangles: every degree is 2 >= ceil(0.4*5)=2 but disconnected
    val g = LocalGraph.fromPairs(6, Seq(0 -> 1, 1 -> 2, 2 -> 0, 3 -> 4, 4 -> 5, 5 -> 3))
    assert(!QuasiClique.isQuasiClique(g, Array(0, 1, 2, 3, 4, 5), 0.4))
    assert(QuasiClique.isQuasiClique(g, Array(0, 1, 2), 1.0))
  }

  test("single vertex is a quasi-clique; empty set is not") {
    val g = LocalGraph.empty(3)
    assert(QuasiClique.isQuasiClique(g, Array(1), 0.9))
    assert(!QuasiClique.isQuasiClique(g, Array.emptyIntArray, 0.9))
  }

  test("a clique is a gamma-quasi-clique for every gamma") {
    val g = GraphGen.erdosRenyi(6, 1.1, 0)
    for (gamma <- Seq(0.5, 0.7, 0.9, 1.0))
      assert(QuasiClique.isQuasiClique(g, Array(0, 1, 2, 3, 4, 5), gamma))
  }

  test("paper example: S1 and S2 of Figure 1 are 0.6-quasi-cliques") {
    val g = GraphGen.figure1
    assert(QuasiClique.isQuasiClique(g, Array(0, 1, 2, 3), 0.6))
    assert(QuasiClique.isQuasiClique(g, Array(0, 1, 2, 3, 4), 0.6))
  }

  test("canon sorts without mutating the input") {
    val in = Array(3, 1, 2)
    val out = QuasiClique.canon(in)
    assert(out.toSeq == Seq(1, 2, 3))
    assert(in.toSeq == Seq(3, 1, 2))
  }
}
