package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.benchlib.Fig3Harness

/** Figure 3: "intersect distinct" over two 1,000,000-row inputs with memory
  * for 100,000 rows per blocking operator (the paper's 100M/10M setup at 1/100
  * scale, preserving the 10:1 input:memory ratio). Prints the table recorded
  * in EXPERIMENTS.md.
  */
class Fig3IntersectBench extends AnyFunSuite {

  test("Figure 3: sort-based plan spills less and runs at least as fast") {
    val r = Fig3Harness.run(n = 1000000, memRows = 100000)
    println()
    println(Fig3Harness.render(r))
    println()

    // Both plans computed identical results (checked inside the harness).
    // The paper's spill accounting: the hash plan spills input rows in the
    // aggregations AND spills the distinct rows again in the join; the sort
    // plan spills each input row at most once.
    assert(r.sort.spilledRows <= 2L * 1000000,
           s"sort plan spilled ${r.sort.spilledRows} > once per input row")
    assert(r.hash.spilledRows > r.sort.spilledRows,
           s"hash=${r.hash.spilledRows} should exceed sort=${r.sort.spilledRows}")
    // Claim 2 (§6): with interesting orderings + OVCs the sort-based plan is
    // more efficient than the hash-based plan.
    assert(r.sort.millis < r.hash.millis,
           f"sort=${r.sort.millis}%.0fms not faster than hash=${r.hash.millis}%.0fms")
  }
}
