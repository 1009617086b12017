package repro.bench

import repro.SparkSpec

/** Shared driver for the Tables II–IV reproduction: runs Q4–Q6 under the
  * Co-Optimization (ADJ) and Communication-First (HCubeJ) strategies on one
  * dataset and prints the paper's cost-breakdown table.
  *
  * The wall-clock budget per test-case stands in for the paper's 43200 s
  * limit and is configurable through BENCH_BUDGET_SEC.
  */
abstract class CostTableBench(tableName: String, dataset: String) extends SparkSpec {

  protected def budgetSec: Double =
    sys.env.getOrElse("BENCH_BUDGET_SEC", "150").toDouble
  protected def samples: Int =
    sys.env.getOrElse("BENCH_SAMPLES", "100").toInt

  test(s"$tableName: co-optimization vs communication-first on $dataset") {
    val rows = Harness.costTable(spark, dataset, budgetSec, samples)
    println(Harness.formatTable(
      s"$tableName: $dataset (budget ${budgetSec.toInt}s per case)", rows, budgetSec))

    // The co-optimized strategy must complete every test-case within budget.
    val co = rows.filter(_.strategy == "Co-Optimization")
    co.foreach { r =>
      assert(!r.timedOut && r.failure.isEmpty, s"co-optimization failed: $r")
    }
    // Where both strategies completed, they must agree on the result size
    // (cross-strategy correctness at bench scale), and the paper's shape —
    // communication-first computation dominating its total — must hold
    // whenever communication-first timed out.
    rows.groupBy(_.query).foreach { case (q, rs) =>
      val Seq(a, b) = rs.sortBy(_.strategy).toSeq
      if (!a.timedOut && !b.timedOut && a.failure.isEmpty && b.failure.isEmpty) {
        assert(a.resultCount == b.resultCount,
          s"$q: strategies disagree (${a.resultCount} vs ${b.resultCount})")
      }
    }
  }
}

/** Table II: AS dataset (paper: ADJ totals 1461/1071/112 s vs
  * communication-first >43200/>43200/30477 s for Q4/Q5/Q6).
  */
class TableIIBench extends CostTableBench("Table II", "AS")

/** Table III: LJ dataset (paper: ADJ totals 1542/501/624 s vs
  * communication-first >43200 s on all of Q4/Q5/Q6).
  */
class TableIIIBench extends CostTableBench("Table III", "LJ")

/** Table IV: OK dataset (paper: ADJ totals 14215/1706/2054 s vs
  * communication-first >43200 s on all of Q4/Q5/Q6).
  */
class TableIVBench extends CostTableBench("Table IV", "OK")
