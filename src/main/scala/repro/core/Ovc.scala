package repro.core

/** Mutable comparison / work counters threaded through engine operators.
  *
  * The paper's efficiency claims are about *counts*: offset-value codes decide
  * most row comparisons with a single integer comparison (`codeComparisons`),
  * bounding expensive `columnComparisons` by N*K for the whole sort. Hash
  * baselines are charged `hashColumnAccesses` (N*K just for the hash function).
  */
final class OvcStats {
  /** Single-integer offset-value-code comparisons (the cheap path). */
  var codeComparisons: Long = 0L

  /** Individual column-value comparisons (the expensive path OVC minimizes). */
  var columnComparisons: Long = 0L

  /** Whole-row comparisons resolved, by code or by columns. */
  var rowComparisons: Long = 0L

  /** Column values touched to compute hash functions (hash baselines only). */
  var hashColumnAccesses: Long = 0L

  def reset(): Unit = {
    codeComparisons = 0; columnComparisons = 0; rowComparisons = 0; hashColumnAccesses = 0
  }

  def add(o: OvcStats): Unit = {
    codeComparisons += o.codeComparisons
    columnComparisons += o.columnComparisons
    rowComparisons += o.rowComparisons
    hashColumnAccesses += o.hashColumnAccesses
  }

  override def toString: String =
    s"OvcStats(code=$codeComparisons, column=$columnComparisons, row=$rowComparisons, hashCol=$hashColumnAccesses)"
}

/** Ascending offset-value codes over fixed-arity `Long` keys, packed into a
  * single non-negative `Long`.
  *
  * `code = (arity - offset) << 48 | value` where `offset` is the length of the
  * maximal shared prefix with the base key and `value` is the key's column at
  * that offset (paper §3, Table 1). Among keys coded relative to the *same*
  * base, a smaller packed code sorts earlier; equality means the keys agree
  * through `offset` and further columns must be compared. `offset == arity`
  * (packed code 0) encodes "equal to base", i.e. a duplicate.
  *
  * Values must fit in 48 unsigned bits. The paper's production systems pack
  * byte offsets and normalized-key bytes instead; the arithmetic is identical.
  */
object Ovc {
  val ValueBits: Int = 48
  val ValueMask: Long = (1L << ValueBits) - 1

  /** Code of an exhausted input — a "late fence" that loses every comparison.
    * Folding fences into the code domain makes fence tests free (paper §3, §5).
    */
  val LateFence: Long = Long.MaxValue

  /** Pack a code. `offset == arity` yields 0 regardless of `value`. */
  def pack(arity: Int, offset: Int, value: Long): Long =
    if (offset >= arity) 0L else ((arity - offset).toLong << ValueBits) | value

  /** Like [[pack]] but validates ranges; use outside hot paths. */
  def packChecked(arity: Int, offset: Int, value: Long): Long = {
    require(arity > 0 && arity <= 0x7ffe, s"bad arity $arity")
    require(offset >= 0 && offset <= arity, s"bad offset $offset for arity $arity")
    require(offset == arity || (value >= 0 && value <= ValueMask),
            s"value $value out of 48-bit range")
    pack(arity, offset, value)
  }

  def offsetOf(code: Long, arity: Int): Int = arity - (code >>> ValueBits).toInt

  def valueOf(code: Long): Long = code & ValueMask

  /** True iff the coded row equals its base (offset == arity). */
  def isDup(code: Long): Boolean = (code >>> ValueBits) == 0L

  /** Code of the first row of a stream, i.e. relative to an implicit "-inf"
    * base sharing no prefix: offset 0, value = first column.
    */
  def initial(key: Array[Long]): Long = pack(key.length, 0, key(0))

  /** Code of `cur` relative to `prev`, where `prev` sorts at or before `cur`.
    * Counts one column comparison per column inspected.
    */
  def encode(prev: Array[Long], cur: Array[Long], stats: OvcStats): Long = {
    val arity = cur.length
    var i = 0
    while (i < arity) {
      stats.columnComparisons += 1
      if (prev(i) != cur(i)) return pack(arity, i, cur(i))
      i += 1
    }
    0L // duplicate of prev
  }

  /** Full-key three-way comparison (baseline path; counts column compares). */
  def compareKeys(a: Array[Long], b: Array[Long], stats: OvcStats): Int = {
    val arity = a.length
    var i = 0
    while (i < arity) {
      stats.columnComparisons += 1
      if (a(i) != b(i)) return if (a(i) < b(i)) -1 else 1
      i += 1
    }
    0
  }

  // --- Display forms used only to reproduce the paper's Table 1 exactly ---

  /** Ascending display code, e.g. offset 0, value 5, arity 4, domain 100 -> 405. */
  def ascDisplay(arity: Int, offset: Int, value: Long, domain: Int = 100): Long =
    if (offset >= arity) 0L else (arity - offset).toLong * domain + value

  /** Descending display code, e.g. offset 3, value 12, domain 100 -> 388. */
  def descDisplay(arity: Int, offset: Int, value: Long, domain: Int = 100): Long =
    if (offset >= arity) (arity.toLong * domain) else offset.toLong * domain + (domain - value)
}

/** The paper's comparison rule for two keys coded relative to the same base
  * (§3): unequal codes decide the comparison outright (and by Iyer's lemma the
  * loser keeps its code); equal codes require column comparisons starting just
  * past the shared offset, and the loser is re-coded relative to the winner.
  *
  * After `compare`, `loserCode` holds the losing key's code relative to the
  * winning key (for ties: the duplicate code 0).
  */
final class OvcComparator(val arity: Int, val stats: OvcStats) {
  var loserCode: Long = 0L

  /** Three-way compare; negative means `a` sorts earlier. */
  def compare(aKey: Array[Long], aCode: Long, bKey: Array[Long], bCode: Long): Int = {
    stats.codeComparisons += 1
    stats.rowComparisons += 1
    if (aCode < bCode) { loserCode = bCode; -1 }       // Iyer: b keeps its code
    else if (aCode > bCode) { loserCode = aCode; 1 }
    else {
      // Equal codes: keys agree with the base, and with each other, through
      // the shared offset. Compare columns from offset+1 on.
      var i = arity - (aCode >>> Ovc.ValueBits).toInt + 1
      while (i < arity) {
        stats.columnComparisons += 1
        if (aKey(i) != bKey(i)) {
          if (aKey(i) < bKey(i)) { loserCode = Ovc.pack(arity, i, bKey(i)); return -1 }
          else { loserCode = Ovc.pack(arity, i, aKey(i)); return 1 }
        }
        i += 1
      }
      loserCode = 0L // equal keys: loser is a duplicate of the winner
      0
    }
  }
}
