package repro.core

import scala.collection.mutable

/** Post-processing phase: remove non-maximal quasi-cliques from the set of
  * valid ones emitted by the miner (Section 3, "postprocessing").
  *
  * The paper uses a prefix tree over result vertex sets; we use an inverted
  * vertex -> result index, probing each set's least-frequent member — same
  * asymptotic role (avoid the all-pairs subset test), simpler to verify.
  */
object Maximality {

  /** Deduplicate `results` (each a sorted vertex array) and keep only those
    * not strictly contained in another result. Output sorted by size
    * descending, then lexicographically.
    */
  def filterMaximal(results: Seq[Array[Int]]): Seq[Array[Int]] = {
    val distinct = results.map(_.toVector).distinct.map(_.toArray)
    val bySize   = distinct.sortBy(a => (-a.length, a.mkString(",")))
    val index    = new mutable.HashMap[Int, mutable.ArrayBuffer[Array[Int]]]
    val kept     = mutable.ArrayBuffer.empty[Array[Int]]

    def isSubsetOf(small: Array[Int], big: Array[Int]): Boolean = {
      if (small.length > big.length) return false
      var i = 0; var j = 0
      while (i < small.length && j < big.length) {
        if (small(i) == big(j)) { i += 1; j += 1 }
        else if (small(i) > big(j)) j += 1
        else return false
      }
      i == small.length
    }

    for (s <- bySize) {
      // probe via the member with the smallest posting list
      var bestList: mutable.ArrayBuffer[Array[Int]] = null
      var i = 0
      while (i < s.length) {
        val l = index.getOrElse(s(i), null)
        if (l == null) { bestList = null; i = s.length } // vertex never seen => no superset
        else {
          if (bestList == null || l.length < bestList.length) bestList = l
          i += 1
        }
      }
      val dominated = bestList != null && bestList.exists(big => big.length > s.length && isSubsetOf(s, big))
      if (!dominated) {
        kept += s
        s.foreach(v => index.getOrElseUpdate(v, mutable.ArrayBuffer.empty) += s)
      }
    }
    kept.toSeq
  }
}
