package repro.bench

import repro.baselines.{EmbedExpand, GThinkerApps, SqlJoin}

/** Table 4: system comparison on the three G-thinker workloads — the
  * Arabesque-style embedding-expansion and the Catalyst-join dataflow
  * baselines versus the task engine with the old and the redesigned
  * scheduler. The paper's shape: task engine >> dataflow systems;
  * G-thinker+ >= G-thinker; Arabesque OOMs on MCF for the bigger graphs.
  */
class Table04_SystemsBench extends BenchSpec {

  private val tcSets  = Seq("Enron", "Hyves", "YouTube")
  private val mcfSets = Seq("Enron", "Hyves", "YouTube")
  private val gmSets  = Seq("Enron", "Amazon", "Hyves")

  test("Table 4(a): Triangle Counting") {
    table("Table 4(a): TC — time (s): EmbedExpand (Arabesque-like) | SqlJoin (Giraph/G-Miner-like) | G-thinker | G-thinker+ | #triangles")
    for (prefix <- tcSets) {
      val g = Datasets(prefix).graph
      val emb = EmbedExpand.triangleCount(sc, g, 16)
      val sql = SqlJoin.triangleCount(spark, g)
      val old = GThinkerApps.triangleCount(sc, g, 16, prioritizeBig = false)
      val neu = GThinkerApps.triangleCount(sc, g, 16, prioritizeBig = true)
      row(f"${prefix}%-10s ${sec(emb.millis)}%8s ${sec(sql.millis)}%8s ${sec(old.millis)}%8s ${sec(neu.millis)}%8s  ${neu.value}%12d")
      assert(Set(emb.value, sql.value, old.value, neu.value).size == 1, "all TC answers must agree")
      assert(neu.millis < emb.millis && neu.millis < sql.millis,
        s"$prefix: task engine should beat the dataflow baselines")
    }
  }

  test("Table 4(b): Maximum Clique Finding") {
    table("Table 4(b): MCF — time (s): EmbedExpand | SqlJoin | G-thinker | G-thinker+ | max clique size")
    for (prefix <- mcfSets) {
      val g = Datasets(prefix).graph
      val old = GThinkerApps.maxClique(sc, g, 16, prioritizeBig = false)
      val neu = GThinkerApps.maxClique(sc, g, 16, prioritizeBig = true)
      val emb = EmbedExpand.maxClique(sc, g, 16, maxEmbeddings = 5_000_000L)
      val embCell = emb match {
        case Right(r) => assert(r.value == neu.value); sec(r.millis)
        case Left(_)  => "X" // out of memory, as Arabesque in the paper
      }
      row(f"${prefix}%-10s ${embCell}%8s ${"-"}%8s ${sec(old.millis)}%8s ${sec(neu.millis)}%8s  ${neu.value}%12d")
      assert(old.value == neu.value)
    }
  }

  test("Table 4(c): Subgraph Matching (4-cliques)") {
    table("Table 4(c): GM (4-cliques) — time (s): EmbedExpand | SqlJoin | G-thinker | G-thinker+ | #matches")
    for (prefix <- gmSets) {
      val g = Datasets(prefix).graph
      val emb = EmbedExpand.fourCliqueCount(sc, g, 16)
      val sql = SqlJoin.fourCliqueCount(spark, g)
      val old = GThinkerApps.fourCliqueCount(sc, g, 16, prioritizeBig = false)
      val neu = GThinkerApps.fourCliqueCount(sc, g, 16, prioritizeBig = true)
      row(f"${prefix}%-10s ${sec(emb.millis)}%8s ${sec(sql.millis)}%8s ${sec(old.millis)}%8s ${sec(neu.millis)}%8s  ${neu.value}%12d")
      assert(Set(emb.value, sql.value, old.value, neu.value).size == 1, "all GM answers must agree")
    }
  }
}
