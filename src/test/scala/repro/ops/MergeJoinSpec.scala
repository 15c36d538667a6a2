package repro.ops

import org.scalatest.funsuite.AnyFunSuite

import repro.Ref
import repro.core._

/** Merge join with OVCs on both inputs (paper §4.7). */
class MergeJoinSpec extends AnyFunSuite {

  private val joinTypes =
    Seq(JoinType.Inner, JoinType.LeftSemi, JoinType.LeftAnti, JoinType.LeftOuter)

  private def check(left: Array[ERow], right: Array[ERow],
                    leftArity: Int, rightArity: Int, joinLen: Int,
                    jt: JoinType, rightPayloadArity: Int = 0): OvcStats = {
    val stats = new OvcStats
    val out = MergeJoinOp(Ref.sortCoded(left).iterator, leftArity,
                          Ref.sortCoded(right).iterator, rightArity,
                          joinLen, jt, stats, rightPayloadArity).toVector
    val expected = Ref.joinRef(left.toIndexedSeq, right.toIndexedSeq, joinLen, jt,
                               rightArity, rightPayloadArity)
    assert(out.map(r => (r.key.toVector, r.payload.toVector)) == expected,
           s"join content mismatch for $jt")
    OvcInvariants.verifyChain(out, leftArity)
    stats
  }

  for (seed <- 0 until 3; jt <- joinTypes; joinLen <- Seq(1, 2)) {
    test(s"$jt joinLen=$joinLen seed=$seed matches reference with a valid code chain") {
      val left = DataGen.randomRows(600, 2, 4, seed, payloadArity = 1)
      val right = DataGen.randomRows(500, 2, 4, seed + 50, payloadArity = 1)
      check(left, right, 2, 2, joinLen, jt, rightPayloadArity = 1)
    }
  }

  for (jt <- joinTypes) {
    test(s"$jt with different arities on the two sides") {
      val left = DataGen.randomRows(400, 3, 3, seed = 7, payloadArity = 1)
      val right = DataGen.randomRows(300, 2, 3, seed = 8, payloadArity = 2)
      check(left, right, 3, 2, joinLen = 2, jt, rightPayloadArity = 2)
    }
  }

  for (jt <- joinTypes) {
    test(s"$jt with an empty right input") {
      val left = DataGen.randomRows(200, 2, 4, seed = 9)
      check(left, Array.empty[ERow], 2, 2, 1, jt)
    }
    test(s"$jt with an empty left input") {
      val right = DataGen.randomRows(200, 2, 4, seed = 10)
      check(Array.empty[ERow], right, 2, 2, 1, jt)
    }
  }

  test("many-to-many duplicate keys produce the full cross product per group") {
    val left = Array.fill(6)(ERow(Array(1L, 1L), Array(1L))) ++
               Array.fill(4)(ERow(Array(2L, 2L), Array(2L)))
    val right = Array.fill(5)(ERow(Array(1L, 9L), Array(7L))) ++
                Array.fill(3)(ERow(Array(2L, 8L), Array(6L)))
    val stats = check(left, right, 2, 2, 1, JoinType.Inner, rightPayloadArity = 1)
    // 6*5 + 4*3 = 42 output rows were checked against the reference above.
    assert(stats.columnComparisons <= (left.length + right.length) * 2L)
  }

  test("distinct inputs joined on the full key: intersection semantics") {
    val rnd = new scala.util.Random(12)
    val l = (0 until 300).map(_ => rnd.nextInt(200)).distinct.map(i => ERow(Array(i.toLong, i.toLong))).toArray
    val r = (0 until 300).map(_ => rnd.nextInt(200)).distinct.map(i => ERow(Array(i.toLong, i.toLong))).toArray
    val stats = new OvcStats
    val out = MergeJoinOp(Ref.sortCoded(l).iterator, 2, Ref.sortCoded(r).iterator, 2,
                          2, JoinType.LeftSemi, stats).toVector
    val expected = l.map(_.key.toVector).toSet.intersect(r.map(_.key.toVector).toSet)
    assert(out.map(_.key.toVector).toSet == expected)
    assert(out.size == expected.size)
    OvcInvariants.verifyChain(out, 2)
  }

  test("join match logic is bounded by N*K column comparisons") {
    val n = 5000
    val left = DataGen.randomRows(n, 4, 3, seed = 20)
    val right = DataGen.randomRows(n, 4, 3, seed = 21)
    val stats = new OvcStats
    MergeJoinOp(Ref.sortCoded(left).iterator, 4, Ref.sortCoded(right).iterator, 4,
                4, JoinType.LeftSemi, stats).foreach(_ => ())
    // The capped-code loser-tree invariant keeps the merge logic linear in
    // N*K, exactly like a binary merge step of an external sort.
    assert(stats.columnComparisons <= 2L * n * 4,
           s"columnComparisons=${stats.columnComparisons}")
  }

  test("anti join of identical inputs is empty; semi join is the distinct set") {
    val rows = DataGen.randomRows(500, 2, 5, seed = 30)
    val in1 = Ref.sortCoded(rows)
    val in2 = Ref.sortCoded(rows)
    val stats = new OvcStats
    assert(MergeJoinOp(in1.iterator, 2, in2.iterator, 2, 2, JoinType.LeftAnti, stats).isEmpty)
  }

  // ---- Lookup join (§4.8) ----

  test("lookup join matches merge join and skips lookups for duplicate outer keys") {
    val outer = DataGen.randomRows(2000, 2, 3, seed = 40, payloadArity = 1) // 9 distinct keys
    val innerRows = DataGen.randomRows(50, 2, 3, seed = 41, payloadArity = 1)
    val byKey = innerRows.groupBy(_.key.toVector)
    val stats = new OvcStats
    val lookupStats = new LookupJoinOp.LookupStats
    val junk = new OvcStats
    def lookup(k: Array[Long]): IndexedSeq[(Array[Long], Array[Long])] =
      byKey.getOrElse(k.toVector, Array.empty[ERow])
        .sortWith((a, b) => Ovc.compareKeys(a.key, b.key, junk) < 0)
        .map(r => (Array.emptyLongArray, r.payload)).toIndexedSeq
    val out = LookupJoinOp(Ref.sortCoded(outer).iterator, 2, 2, lookup,
                           JoinType.Inner, stats, lookupStats).toVector
    val expected = Ref.joinRef(outer.toIndexedSeq, innerRows.toIndexedSeq, 2,
                               JoinType.Inner, 2, 1)
    assert(out.map(r => (r.key.toVector, r.payload.toVector)) == expected)
    OvcInvariants.verifyChain(out, 2)
    // 2000 outer rows but at most 9 distinct keys: OVCs collapse the probes.
    assert(lookupStats.calls <= 9, s"lookup calls=${lookupStats.calls}")
  }

  for (jt <- joinTypes) {
    test(s"lookup join $jt agrees with the reference") {
      val outer = DataGen.randomRows(400, 2, 4, seed = 42, payloadArity = 1)
      val innerRows = DataGen.randomRows(60, 2, 4, seed = 43, payloadArity = 1)
      val byKey = innerRows.groupBy(_.key.toVector)
      val junk = new OvcStats
      def lookup(k: Array[Long]): IndexedSeq[(Array[Long], Array[Long])] =
        byKey.getOrElse(k.toVector, Array.empty[ERow])
          .sortWith((a, b) => Ovc.compareKeys(a.key, b.key, junk) < 0)
          .map(r => (Array.emptyLongArray, r.payload)).toIndexedSeq
      val stats = new OvcStats
      val out = LookupJoinOp(Ref.sortCoded(outer).iterator, 2, 2, lookup, jt, stats,
                             nullSentinelArity = 1).toVector
      val expected = Ref.joinRef(outer.toIndexedSeq, innerRows.toIndexedSeq, 2, jt, 2, 1)
      assert(out.map(r => (r.key.toVector, r.payload.toVector)) == expected)
      OvcInvariants.verifyChain(out, 2)
    }
  }
}
