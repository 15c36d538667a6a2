package repro.sort

import org.scalatest.funsuite.AnyFunSuite

import repro.Ref
import repro.core._

/** Run generation by replacement selection (paper §3). */
class ReplacementSelectionSpec extends AnyFunSuite {

  private def runsOf(rows: Array[ERow], memRows: Int, arity: Int,
                     stats: OvcStats = new OvcStats): Vector[Vector[CodedRow]] =
    new ReplacementSelection(rows.iterator, memRows, arity, stats)
      .runs.map(_.toVector).toVector

  for (seed <- 0 until 4; memRows <- Seq(7, 64, 500)) {
    test(s"runs are sorted with exact codes and partition the input (memRows=$memRows, seed=$seed)") {
      val rows = DataGen.randomRows(3000, 3, 8, seed, payloadArity = 1)
      val runs = runsOf(rows, memRows, 3)
      assert(runs.map(_.size).sum == rows.length)
      runs.foreach { run =>
        OvcInvariants.verifyChain(run, 3) // sortedness + exact code chain
      }
      val emitted = runs.flatten.map(r => (r.key :+ -1L) ++ r.payload)
        .map(_.toVector).sortBy(_.mkString(","))
      val expected = rows.map(r => (r.key :+ -1L) ++ r.payload)
        .map(_.toVector).toVector.sortBy(_.mkString(","))
      assert(emitted == expected)
    }
  }

  test("random input yields ~N/(2M) runs (expected run length 2M)") {
    // Use a wide key domain so ties don't inflate run lengths.
    val rows = DataGen.randomRows(40000, 2, 100000, seed = 5)
    val m = 100
    val runs = runsOf(rows, m, 2)
    val n = rows.length
    assert(runs.size < n / m, s"${runs.size} runs: no better than chunked generation")
    assert(runs.size > n / (4 * m), s"${runs.size} runs: suspiciously few")
    val avg = n.toDouble / runs.size
    assert(avg > 1.5 * m && avg < 3.0 * m, f"average run length $avg%.0f not near 2M=${2 * m}")
  }

  test("already-sorted input produces a single run") {
    val rows = DataGen.refSortCoded(DataGen.randomRows(5000, 2, 50, seed = 6))
      .map(r => ERow(r.key, r.payload)).toArray
    val runs = runsOf(rows, 64, 2)
    assert(runs.size == 1)
    OvcInvariants.verifyChain(runs.head, 2)
  }

  test("reverse-sorted input produces runs of exactly M rows") {
    val rows = (4999 to 0 by -1).map(i => ERow(Array(i.toLong, 0L))).toArray
    val m = 100
    val runs = runsOf(rows, m, 2)
    assert(runs.size == rows.length / m)
    assert(runs.forall(_.size == m))
  }

  test("merging replacement-selection runs reproduces the reference sort exactly") {
    val rows = DataGen.randomRows(8000, 3, 10, seed = 7, payloadArity = 1)
    val stats = new OvcStats
    val runs = runsOf(rows, 128, 3, stats)
    val merged = new LoserTree(runs.map(_.iterator), 3, stats).toVector
    val expected = Ref.sortCoded(rows)
    assert(merged.map(_.key.toVector) == expected.map(_.key.toVector))
    assert(merged.map(_.code) == expected.map(_.code))
    OvcInvariants.verifyChain(merged, 3)
  }

  test("fewer runs than chunked generation means fewer rows to merge per level") {
    val rows = DataGen.randomRows(20000, 2, 100000, seed = 8)
    val m = 200
    val rsRuns = runsOf(rows, m, 2).size
    val chunkedRuns = math.ceil(rows.length.toDouble / m).toInt
    assert(rsRuns < chunkedRuns)
  }

  test("empty and tiny inputs") {
    assert(runsOf(Array.empty[ERow], 8, 2).isEmpty)
    val one = runsOf(Array(ERow(Array(1L, 2L))), 8, 2)
    assert(one.size == 1 && one.head.map(_.key.toVector) == Vector(Vector(1L, 2L)))
  }

  test("duplicate-heavy input: duplicates stay within runs with duplicate codes") {
    val rows = DataGen.randomRows(5000, 2, 2, seed = 9) // 4 distinct keys
    val runs = runsOf(rows, 50, 2)
    runs.foreach(run => OvcInvariants.verifyChain(run, 2))
    assert(runs.map(_.size).sum == 5000)
    // Ties join the current run, so duplicates make runs *longer* than the
    // 2M expected for distinct random keys.
    val avg = 5000.0 / runs.size
    assert(avg >= 2 * 50, f"average run length $avg%.0f below 2M despite duplicates")
  }
}
