package repro.sort

import org.scalatest.funsuite.AnyFunSuite

import repro.Ref
import repro.core._

/** Tree-of-losers priority queue with offset-value coding. */
class LoserTreeSpec extends AnyFunSuite {

  private def split[T](rows: Vector[T], k: Int): IndexedSeq[Vector[T]] =
    (0 until k).map(i => rows.zipWithIndex.filter(_._2 % k == i).map(_._1))

  /** Merge `k` pre-sorted coded runs of `rows` and compare against the
    * reference sort of the union; codes must match exactly.
    */
  private def checkMerge(rows: Array[ERow], k: Int, arity: Int): Unit = {
    val junk = new OvcStats
    val expected = Ref.sortCoded(rows)
    // Build k runs round-robin over the *sorted* rows so each run is sorted.
    val sortedRows = rows.sortWith((a, b) => Ovc.compareKeys(a.key, b.key, junk) < 0)
    val runs = split(sortedRows.toVector, k)
      .map(run => DataGen.codeSorted(run.map(_.key), run.map(_.payload)))
    val stats = new OvcStats
    val merged = new LoserTree(runs.map(_.iterator), arity, stats).toVector
    assert(merged.length == expected.length)
    OvcInvariants.verifyChain(merged, arity)
    assert(merged.map(_.key.toVector) == expected.map(_.key.toVector))
    assert(merged.map(_.code) == expected.map(_.code))
  }

  for (seed <- 0 until 3; arity <- Seq(1, 2, 4, 6); k <- Seq(1, 2, 3, 5, 8, 16)) {
    test(s"merge $k runs, arity=$arity, seed=$seed: matches reference sort and codes") {
      checkMerge(DataGen.randomRows(800, arity, 5, seed, payloadArity = 1), k, arity)
    }
  }

  for (seed <- Seq(0, 1)) {
    test(s"merge duplicate-heavy input (seed=$seed)") {
      checkMerge(DataGen.randomRows(1000, 3, 2, seed), 7, 3)
    }
  }

  test("single input passes through unchanged") {
    val rows = DataGen.refSortCoded(DataGen.randomRows(100, 2, 4, seed = 9))
    val stats = new OvcStats
    val out = new LoserTree(IndexedSeq(rows.iterator), 2, stats).toVector
    assert(out == rows)
  }

  test("empty inputs produce an empty merge") {
    val stats = new OvcStats
    val out = new LoserTree(IndexedSeq(Iterator.empty, Iterator.empty), 3, stats).toVector
    assert(out.isEmpty)
  }

  test("merge of empty and non-empty inputs") {
    val rows = DataGen.refSortCoded(DataGen.randomRows(50, 2, 3, seed = 5))
    val stats = new OvcStats
    val out = new LoserTree(IndexedSeq(Iterator.empty, rows.iterator, Iterator.empty), 2, stats).toVector
    assert(out.map(_.key.toVector) == rows.map(_.key.toVector))
  }

  test("column comparisons are bounded by N*K during a merge (no log factor)") {
    val arity = 4
    val n = 5000
    val rows = DataGen.randomRows(n, arity, 3, seed = 21)
    val junk = new OvcStats
    val sortedRows = rows.sortWith((a, b) => Ovc.compareKeys(a.key, b.key, junk) < 0)
    val runs = split(sortedRows.toVector, 16)
      .map(run => DataGen.codeSorted(run.map(_.key), run.map(_.payload)))
    val stats = new OvcStats
    new LoserTree(runs.map(_.iterator), arity, stats).foreach(_ => ())
    // Paper §3: the sum of all offset increments is at most K per row, so
    // column comparisons in one merge are at most N*K (plus nothing else).
    assert(stats.columnComparisons <= n.toLong * arity,
           s"columnComparisons=${stats.columnComparisons} > N*K=${n * arity}")
    // And the whole-row decisions are dominated by single-integer code tests.
    assert(stats.codeComparisons >= stats.rowComparisons)
  }

  test("run generation via single-row runs yields the reference codes") {
    val rows = DataGen.randomRows(2000, 3, 4, seed = 17, payloadArity = 1)
    val stats = new OvcStats
    val singles = rows.map(r => Iterator.single(CodedRow(r.key, Ovc.initial(r.key), r.payload))).toIndexedSeq
    val out = new LoserTree(singles, 3, stats).toVector
    val expected = Ref.sortCoded(rows)
    assert(out.map(_.key.toVector) == expected.map(_.key.toVector))
    assert(out.map(_.code) == expected.map(_.code))
    assert(out.map(_.payload.toVector) == expected.map(_.payload.toVector))
    OvcInvariants.verifyChain(out, 3)
  }
}
