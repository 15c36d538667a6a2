package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.benchlib.TablesHarness

/** Reproduces the paper's Table 1 and Table 2 exactly and prints them. */
class PaperTablesBench extends AnyFunSuite {

  test("Table 1 and Table 2 reproduce the paper's codes exactly") {
    val t1 = TablesHarness.table1()
    assert(t1.map(_._2) == Vector(95L, 388L, 192L, 191L, 400L, 297L, 393L))
    assert(t1.map(_._3) == Vector(405L, 112L, 308L, 309L, 0L, 203L, 107L))
    val t2 = TablesHarness.table2()
    assert(t2.map(_._2) == Vector(405L, 309L))
    println()
    println(TablesHarness.render())
    println()
  }
}
