package repro.sort

import org.scalatest.funsuite.AnyFunSuite

import repro.Ref
import repro.core._

/** External merge sort: spilling, multi-level merges, in-sort dedup. */
class ExternalSortSpec extends AnyFunSuite {

  private def run(rows: Array[ERow], arity: Int, memRows: Int,
                  dedup: Boolean = false, fanIn: Int = ExternalSort.DefaultFanIn,
                  payloadArity: Int = 0)
      : (Vector[CodedRow], OvcStats, SpillStats) = {
    val stats = new OvcStats
    val spill = new SpillStats
    val out = ExternalSort.sort(rows.iterator, arity, payloadArity, memRows,
                                stats, spill, dedup, fanIn).toVector
    (out, stats, spill)
  }

  for (seed <- 0 until 3; memRows <- Seq(16, 100, 1000, 100000)) {
    test(s"sorts like the reference, memRows=$memRows, seed=$seed") {
      val rows = DataGen.randomRows(1000, 3, 6, seed)
      val (out, _, _) = run(rows, 3, memRows)
      val expected = Ref.sortCoded(rows)
      assert(out.map(_.key.toVector) == expected.map(_.key.toVector))
      assert(out.map(_.code) == expected.map(_.code))
      OvcInvariants.verifyChain(out, 3)
    }
  }

  test("in-memory input does not spill") {
    val rows = DataGen.randomRows(500, 2, 5, seed = 1)
    val (out, _, spill) = run(rows, 2, memRows = 1000)
    assert(out.size == 500)
    assert(spill.rowsSpilled == 0)
    assert(spill.runsWritten == 0)
  }

  test("external input spills each row exactly once with a single merge level") {
    val n = 10000
    val rows = DataGen.randomRows(n, 3, 50, seed = 2)
    val (out, _, spill) = run(rows, 3, memRows = 1000)
    assert(out.size == n)
    assert(spill.rowsSpilled == n) // the paper's Figure 3 accounting
    assert(spill.runsWritten == 10)
    assert(spill.mergeLevels == 0) // 10 runs < fan-in: no intermediate level
  }

  test("tiny fan-in forces intermediate merge levels and re-spilling") {
    val n = 2000
    val rows = DataGen.randomRows(n, 2, 40, seed = 3)
    val (out, _, spill) = run(rows, 2, memRows = 100, fanIn = 4)
    assert(out.map(_.key.toVector) == Ref.sortCoded(rows).map(_.key.toVector))
    assert(spill.mergeLevels >= 1)
    assert(spill.rowsSpilled > n) // rows re-spilled by intermediate merges
  }

  for (seed <- 0 until 3) {
    test(s"in-sort dedup returns exactly the distinct keys in order (seed=$seed)") {
      val rows = DataGen.randomRows(3000, 3, 3, seed) // heavy duplication
      val (out, _, _) = run(rows, 3, memRows = 256, dedup = true)
      assert(out.map(_.key.toVector) == Ref.distinctSorted(rows))
      assert(out.forall(r => !Ovc.isDup(r.code)))
      OvcInvariants.verifyChain(out, 3)
    }
  }

  test("in-sort dedup spills fewer rows than the input (duplicates dropped early)") {
    val n = 20000
    val rows = DataGen.randomRows(n, 2, 4, seed = 5) // 16 distinct keys
    val (out, _, spill) = run(rows, 2, memRows = 1000, dedup = true)
    assert(out.size <= 16)
    assert(spill.rowsSpilled < n / 10,
           s"early dedup should spill almost nothing, spilled ${spill.rowsSpilled}")
  }

  test("payloads survive spilling and merging") {
    val rows = DataGen.randomRows(5000, 2, 30, seed = 6, payloadArity = 2)
    val (out, _, spill) = run(rows, 2, memRows = 500, payloadArity = 2)
    assert(spill.rowsSpilled == 5000)
    val expected = Ref.sortCoded(rows)
    assert(out.map(r => (r.key.toVector, r.payload.toVector)) ==
           expected.map(r => (r.key.toVector, r.payload.toVector)))
  }

  test("column comparisons stay near the N*K bound across the full sort") {
    val n = 20000
    val arity = 4
    val rows = DataGen.randomRows(n, arity, 4, seed = 7)
    val (_, stats, _) = run(rows, arity, memRows = 2000)
    // Run generation and one merge level: each phase is bounded by N*K.
    assert(stats.columnComparisons <= 2L * n * arity,
           s"columnComparisons=${stats.columnComparisons}")
  }

  test("empty input yields an empty stream") {
    val (out, _, spill) = run(Array.empty[ERow], 3, 100)
    assert(out.isEmpty)
    assert(spill.rowsSpilled == 0)
  }

  test("single-row input") {
    val (out, _, _) = run(Array(ERow(Array(7L, 8L))), 2, 100)
    assert(out.map(_.key.toVector) == Vector(Vector(7L, 8L)))
    assert(out.head.code == Ovc.initial(Array(7L, 8L)))
  }
}
