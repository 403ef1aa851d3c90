package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class MaximalitySpec extends AnyFunSuite {

  private def naive(results: Seq[Array[Int]]): Set[Vector[Int]] = {
    val d = results.map(_.toVector).distinct
    d.filter(s => !d.exists(t => t.size > s.size && s.toSet.subsetOf(t.toSet))).toSet
  }

  for (seed <- 1 to 10) test(s"filterMaximal matches the naive quadratic filter (seed=$seed)") {
    val rnd = new Random(seed)
    val fam = Seq.fill(60) {
      val sz = 1 + rnd.nextInt(6)
      Array.fill(sz)(rnd.nextInt(15)).distinct.sorted
    }
    assert(Maximality.filterMaximal(fam).map(_.toVector).toSet == naive(fam))
  }

  test("duplicates collapse to one") {
    val fam = Seq(Array(1, 2, 3), Array(1, 2, 3), Array(1, 2))
    val out = Maximality.filterMaximal(fam)
    assert(out.map(_.toVector) == Seq(Vector(1, 2, 3)))
  }

  test("equal-size incomparable sets are all kept") {
    val fam = Seq(Array(1, 2), Array(3, 4), Array(2, 3))
    assert(Maximality.filterMaximal(fam).size == 3)
  }

  test("chain of subsets keeps only the top") {
    val fam = Seq(Array(1), Array(1, 2), Array(1, 2, 3), Array(1, 2, 3, 4))
    assert(Maximality.filterMaximal(fam).map(_.toVector) == Seq(Vector(1, 2, 3, 4)))
  }

  test("output is ordered by size descending") {
    val fam = Seq(Array(1, 2), Array(5, 6, 7), Array(9))
    val out = Maximality.filterMaximal(fam)
    assert(out.map(_.length) == out.map(_.length).sorted.reverse)
  }

  test("empty input") {
    assert(Maximality.filterMaximal(Nil).isEmpty)
  }
}
