package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.benchlib.Fig1Harness

/** Figure 1: in-stream aggregation over 1,000,000 rows — group-boundary
  * detection via the packed OVC vs full comparisons of multiple key columns,
  * across input:output row ratios. Prints the table recorded in
  * EXPERIMENTS.md.
  */
class Fig1GroupBoundariesBench extends AnyFunSuite {

  test("Figure 1: OVC boundary detection beats full key comparisons") {
    val n = 1000000
    val rows = Fig1Harness.run(n, Seq(1, 2, 5, 10, 20, 50, 100), arity = 4, reps = 5)
    println()
    println(Fig1Harness.render(rows, n))
    println()

    // The OVC variant never touches a column value; the baseline must.
    assert(rows.forall(_.ovcColCmp == 0L))
    assert(rows.forall(_.fullColCmp >= n.toLong),
           "full comparison must inspect at least one column per row")
    // Figure 1's claim: within the sorted output, testing the offset against
    // the grouping-column count is much faster than full comparisons — we
    // require a majority win and an aggregate win to keep noise out of CI.
    val wins = rows.count(r => r.ovcMs < r.fullMs)
    assert(wins * 2 >= rows.size, s"OVC slower in ${rows.size - wins}/${rows.size} ratios")
    val totalSpeedup = rows.map(_.fullMs).sum / rows.map(_.ovcMs).sum
    assert(totalSpeedup > 1.0, f"aggregate speedup $totalSpeedup%.2f <= 1")
  }
}
