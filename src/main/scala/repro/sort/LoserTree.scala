package repro.sort

import repro.core.{CodedRow, Ovc, OvcComparator, OvcStats}

/** Tree-of-losers priority queue with offset-value coding (paper §3).
  *
  * Merges `inputs.length` sorted, coded streams into one sorted, coded stream.
  * Each input row's code must be relative to its predecessor in the same input
  * (the first row of each input relative to "-inf"). The emitted stream's
  * codes are relative to the previously emitted row — the tree maintains the
  * invariant that every stored loser is coded relative to the winner that beat
  * it, so along the winner's leaf-to-root path all keys are coded relative to
  * the prior overall winner, and the successor pulled from the winner's input
  * arrives already coded relative to that same winner.
  *
  * Exhausted inputs carry the late-fence code [[Ovc.LateFence]]; fence tests
  * subsume code comparisons, as in the paper's F1 implementation (§5).
  *
  * Ties are won by the lower input index, making the merge stable; the losing
  * duplicate is re-coded with the duplicate code 0.
  */
final class LoserTree(inputs: IndexedSeq[Iterator[CodedRow]], arity: Int, stats: OvcStats)
    extends Iterator[CodedRow] {

  private[this] val m = inputs.length
  require(m > 0, "LoserTree needs at least one input")

  // Entry count padded to a power of two; padding entries are permanent fences.
  private[this] val treeSize: Int = { var s = 1; while (s < m) s <<= 1; s }

  private[this] val keys     = new Array[Array[Long]](treeSize)
  private[this] val codes    = new Array[Long](treeSize)
  private[this] val payloads = new Array[Array[Long]](treeSize)
  // node(1..treeSize-1): entry index of the loser at each internal node;
  // node(0): the overall winner.
  private[this] val node = new Array[Int](treeSize)

  private[this] val cmp = new OvcComparator(arity, stats)

  private def advanceEntry(e: Int): Unit = {
    if (e < m && inputs(e).hasNext) {
      val r = inputs(e).next()
      keys(e) = r.key; codes(e) = r.code; payloads(e) = r.payload
    } else {
      keys(e) = null; codes(e) = Ovc.LateFence; payloads(e) = null
    }
  }

  /** Returns the winning entry of a comparison, updating the loser's code. */
  private def playMatch(a: Int, b: Int): Int = {
    // Fence tests come first and are free in the sense of the paper: they are
    // the same single-integer comparison that would compare the codes.
    if (codes(a) == Ovc.LateFence) return b
    if (codes(b) == Ovc.LateFence) return a
    val c = cmp.compare(keys(a), codes(a), keys(b), codes(b))
    if (c < 0) { codes(b) = cmp.loserCode; a }
    else if (c > 0) { codes(a) = cmp.loserCode; b }
    else if (a < b) { codes(b) = cmp.loserCode; a } // stable: lower index wins
    else { codes(a) = cmp.loserCode; b }
  }

  // Initialization: fill all entries, then run the initial tournament
  // bottom-up; each internal node keeps its loser, the winner moves up.
  {
    var e = 0
    while (e < treeSize) { advanceEntry(e); e += 1 }
    def build(k: Int): Int =
      if (k >= treeSize) k - treeSize
      else {
        val l = build(2 * k); val r = build(2 * k + 1)
        val w = playMatch(l, r)
        node(k) = if (w == l) r else l
        w
      }
    node(0) = if (treeSize == 1) 0 else build(1)
  }

  override def hasNext: Boolean = codes(node(0)) != Ovc.LateFence

  override def next(): CodedRow = {
    val w = node(0)
    val out = CodedRow(keys(w), codes(w), payloads(w))
    // Replace the winner with its successor and replay its leaf-to-root path.
    advanceEntry(w)
    var cur = w
    var k = (treeSize + w) >> 1
    while (k >= 1) {
      val winner = playMatch(cur, node(k))
      if (winner != cur) { node(k) = cur; cur = winner }
      k >>= 1
    }
    node(0) = cur
    out
  }
}
