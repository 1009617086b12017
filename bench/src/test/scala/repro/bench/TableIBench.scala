package repro.bench

import repro.SparkSpec

/** Reproduces Table I: dataset statistics of the six (synthetic stand-in)
  * graphs. Paper: WB 13.2M / AS 22.1M / WT 50.9M / LJ 69.4M / EN 183.9M /
  * OK 234.4M tuples; ours are scaled ~1/400 (see DESIGN.md §3).
  */
class TableIBench extends SparkSpec {

  test("Table I: dataset statistics") {
    val table = Harness.datasetTable(spark)
    println(table)
    // Shape checks: six rows, strictly increasing |R| in the paper's order.
    val counts = repro.data.GraphData.all.map(s =>
      repro.data.GraphData.graph(spark, s).count())
    assert(counts.length == 6)
    assert(counts == counts.sorted, s"dataset sizes out of order: $counts")
    // Within 2x of the 1/400-scaled paper sizes.
    val target = Seq(33000L, 55250L, 127250L, 173500L, 459750L, 586000L)
    counts.zip(target).foreach { case (n, t) =>
      assert(n > t / 2 && n < t * 2, s"size $n too far from scaled target $t")
    }
  }
}
