package repro.core

import repro.graph.LocalGraph

/** Exponential ground-truth enumerators for tests (n <= ~18 vertices).
  * These define correctness: the miners must agree with them exactly.
  */
object BruteForce {

  /** All valid γ-quasi-cliques with >= tauSize vertices, as sorted arrays. */
  def allValid(g: LocalGraph, gamma: Double, tauSize: Int): Seq[Array[Int]] = {
    require(g.n <= 22, s"brute force is exponential; got n=${g.n}")
    val out = Seq.newBuilder[Array[Int]]
    var mask = 1L
    val limit = 1L << g.n
    while (mask < limit) {
      if (java.lang.Long.bitCount(mask) >= tauSize) {
        val vs = (0 until g.n).filter(v => (mask & (1L << v)) != 0).toArray
        if (QuasiClique.isQuasiClique(g, vs, gamma)) out += vs
      }
      mask += 1
    }
    out.result()
  }

  /** All MAXIMAL valid γ-quasi-cliques with >= tauSize vertices.
    * Maximality is with respect to all valid quasi-cliques (any superset of
    * a size >= tauSize set is itself >= tauSize, so filtering within the
    * thresholded set is equivalent).
    */
  def allMaximal(g: LocalGraph, gamma: Double, tauSize: Int): Seq[Array[Int]] =
    Maximality.filterMaximal(allValid(g, gamma, tauSize))

  /** Maximum clique size (simple branch and bound, for MCF tests). */
  def maxCliqueSize(g: LocalGraph): Int = {
    var best = 0
    def grow(current: List[Int], cand: Array[Int]): Unit = {
      if (current.size > best) best = current.size
      if (current.size + cand.length <= best) return
      var i = 0
      while (i < cand.length) {
        val v = cand(i)
        val rest = cand.drop(i + 1).filter(g.hasEdge(v, _))
        grow(v :: current, rest)
        i += 1
      }
    }
    grow(Nil, (0 until g.n).toArray)
    best
  }

  /** Exact triangle count (for TC tests). */
  def triangles(g: LocalGraph): Long = {
    var c = 0L
    var u = 0
    while (u < g.n) {
      val a = g.adj(u)
      var i = 0
      while (i < a.length) {
        val v = a(i)
        if (v > u) {
          var j = i + 1
          while (j < a.length) { if (a(j) > v && g.hasEdge(v, a(j))) c += 1; j += 1 }
        }
        i += 1
      }
      u += 1
    }
    c
  }

  /** Exact 4-clique count (for the GM workload of Table 4). */
  def fourCliques(g: LocalGraph): Long = {
    var c = 0L
    var u = 0
    while (u < g.n) {
      val a = g.adj(u).filter(_ > u)
      var i = 0
      while (i < a.length) {
        var j = i + 1
        while (j < a.length) {
          if (g.hasEdge(a(i), a(j))) {
            var k = j + 1
            while (k < a.length) {
              if (g.hasEdge(a(i), a(k)) && g.hasEdge(a(j), a(k))) c += 1
              k += 1
            }
          }
          j += 1
        }
        i += 1
      }
      u += 1
    }
    c
  }
}
