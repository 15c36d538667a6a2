package repro.plans

import org.scalatest.funsuite.AnyFunSuite

import repro.benchlib.Fig3Harness
import repro.core._

/** The two "intersect distinct" plans of Figure 2/3 at test scale. */
class IntersectPlansSpec extends AnyFunSuite {

  private def refIntersect(t1: Array[ERow], t2: Array[ERow]): Set[Vector[Long]] =
    t1.map(_.key.toVector).toSet.intersect(t2.map(_.key.toVector).toSet)

  for (seed <- 0 until 3) {
    test(s"both plans compute the exact intersection (seed=$seed)") {
      val t1 = DataGen.randomRows(3000, 3, 8, seed)
      val t2 = DataGen.randomRows(3000, 3, 8, seed + 77)
      val expected = refIntersect(t1, t2).size.toLong
      val sort = IntersectPlans.sortBased(() => t1.iterator, () => t2.iterator, 3, memRows = 500)
      val hash = IntersectPlans.hashBased(() => t1.iterator, () => t2.iterator, 3, memRows = 500)
      assert(sort.outputRows == expected)
      assert(hash.outputRows == expected)
    }
  }

  test("in-memory execution (no spills) when operators fit") {
    val t1 = DataGen.randomRows(1000, 2, 10, seed = 5)
    val t2 = DataGen.randomRows(1000, 2, 10, seed = 6)
    val sort = IntersectPlans.sortBased(() => t1.iterator, () => t2.iterator, 2, memRows = 100000)
    val hash = IntersectPlans.hashBased(() => t1.iterator, () => t2.iterator, 2, memRows = 100000)
    assert(sort.spilledRows == 0)
    assert(hash.spilledRows == 0)
    assert(sort.outputRows == hash.outputRows)
  }

  test("under memory pressure the sort plan spills fewer rows than the hash plan") {
    val r = Fig3Harness.run(n = 60000, memRows = 6000, seed = 11)
    assert(r.sort.spilledRows > 0)
    assert(r.hash.spilledRows > r.sort.spilledRows,
           s"hash=${r.hash.spilledRows} sort=${r.sort.spilledRows}")
  }

  test("sort plan's column comparisons are dwarfed by hash plan's column accesses") {
    val r = Fig3Harness.run(n = 30000, memRows = 3000, seed = 12)
    // The paper's closing argument: hash execution touches N*K columns for
    // hashing alone; OVC sort execution touches only columns needed to
    // establish differences.
    assert(r.sort.stats.hashColumnAccesses == 0)
    assert(r.hash.stats.hashColumnAccesses > 2L * 30000 * 4)
  }

  test("Fig3 harness inputs overlap roughly as designed (~thirds)") {
    val r = Fig3Harness.run(n = 20000, memRows = 100000, seed = 13)
    // ids: T1 in [0, n/2), T2 in [n/4, 3n/4): about half of each side's
    // distinct ids lie in the shared range.
    assert(r.sort.outputRows > 1000, s"intersection too small: ${r.sort.outputRows}")
    assert(r.sort.outputRows < 10000, s"intersection too large: ${r.sort.outputRows}")
  }
}
