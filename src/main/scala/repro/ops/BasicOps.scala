package repro.ops

import repro.core.{CodedRow, Ovc, OvcStats}

/** Filter over a sorted, coded stream (paper §4.1): an output row's code is
  * the max (ascending coding) of its input code and the codes of all rows
  * dropped since the previous output row — a direct application of the
  * theorem `ovc(A,C) = max(ovc(A,B), ovc(B,C))`. No column comparisons.
  */
object FilterOp {
  def apply(in: Iterator[CodedRow], pred: CodedRow => Boolean): Iterator[CodedRow] =
    new Iterator[CodedRow] {
      private[this] var pendingMax = 0L
      private[this] var out: CodedRow = null

      private def advance(): Unit =
        while (out == null && in.hasNext) {
          val r = in.next()
          if (pred(r)) {
            out = CodedRow(r.key, math.max(r.code, pendingMax), r.payload)
            pendingMax = 0L
          } else pendingMax = math.max(pendingMax, r.code)
        }

      override def hasNext: Boolean = { advance(); out != null }
      override def next(): CodedRow = {
        advance()
        val r = out; out = null
        if (r == null) throw new NoSuchElementException
        r
      }
    }
}

/** Projection (paper §4.2): keep the first `keepLen` key columns. Offsets are
  * capped to the surviving prefix; a row whose first difference lay beyond the
  * surviving prefix becomes a duplicate w.r.t. the shortened key (code 0).
  * Output may contain duplicates — "relationally pure" projection follows
  * with [[DedupOp]].
  */
object ProjectOp {
  def capCode(code: Long, arity: Int, keepLen: Int): Long = {
    val off = Ovc.offsetOf(code, arity)
    if (off >= keepLen) 0L else Ovc.pack(keepLen, off, Ovc.valueOf(code))
  }

  def apply(in: Iterator[CodedRow], arity: Int, keepLen: Int): Iterator[CodedRow] = {
    require(keepLen > 0 && keepLen <= arity, s"bad keepLen $keepLen for arity $arity")
    in.map(r => CodedRow(r.key.take(keepLen), capCode(r.code, arity, keepLen), r.payload))
  }
}

/** Duplicate removal in a sorted coded stream (paper §4.4): suppress rows
  * whose offset equals the arity; all surviving rows keep their input codes
  * (the duplicate code 0 is the identity of the §4.1 max-fold).
  */
object DedupOp {
  def apply(in: Iterator[CodedRow]): Iterator[CodedRow] =
    in.filterNot(r => Ovc.isDup(r.code))
}

/** In-stream grouping / aggregation (paper §4.5, Figure 1): a group boundary
  * is a row whose offset is smaller than the "group by" arity — one integer
  * test per row against the packed code, no column accesses. The output row
  * keeps the code of the group's first input row, re-packed to the group-key
  * arity. Aggregates: row count and, when a payload is present, the sum of
  * payload column 0.
  */
object GroupAggOp {

  @inline def isBoundary(code: Long, inArity: Int, groupLen: Int): Boolean =
    (code >>> Ovc.ValueBits) > (inArity - groupLen).toLong // offset < groupLen

  /** OVC-driven variant: boundary detection via the packed code only. */
  def countByOvc(in: Iterator[CodedRow], inArity: Int, groupLen: Int,
                 stats: OvcStats): Iterator[CodedRow] =
    new Iterator[CodedRow] {
      require(groupLen > 0 && groupLen <= inArity)
      private[this] var cur: CodedRow = if (in.hasNext) in.next() else null

      override def hasNext: Boolean = cur != null
      override def next(): CodedRow = {
        if (cur == null) throw new NoSuchElementException
        val groupKey = cur.key.take(groupLen)
        val groupCode = Ovc.pack(groupLen, Ovc.offsetOf(cur.code, inArity), Ovc.valueOf(cur.code))
        var count = 1L
        var sum = if (cur.payload.nonEmpty) cur.payload(0) else 0L
        cur = null
        var continue = true
        while (continue && in.hasNext) {
          val r = in.next()
          stats.codeComparisons += 1
          if (isBoundary(r.code, inArity, groupLen)) { cur = r; continue = false }
          else { count += 1; if (r.payload.nonEmpty) sum += r.payload(0) }
        }
        CodedRow(groupKey, groupCode, Array(count, sum))
      }
    }

  /** Baseline: boundary detection by comparing the group-key prefix of each
    * row against the previous row, column by column (Figure 1's "full
    * comparisons of multiple key columns").
    */
  def countByFullCompare(in: Iterator[CodedRow], inArity: Int, groupLen: Int,
                         stats: OvcStats): Iterator[CodedRow] =
    new Iterator[CodedRow] {
      require(groupLen > 0 && groupLen <= inArity)
      private[this] var cur: CodedRow = if (in.hasNext) in.next() else null
      private[this] var curBoundaryCode: Long =
        if (cur == null) 0L else Ovc.pack(groupLen, 0, cur.key(0))

      override def hasNext: Boolean = cur != null
      override def next(): CodedRow = {
        if (cur == null) throw new NoSuchElementException
        val groupKey = cur.key.take(groupLen)
        val groupCode = curBoundaryCode
        var count = 1L
        var sum = if (cur.payload.nonEmpty) cur.payload(0) else 0L
        cur = null
        var continue = true
        while (continue && in.hasNext) {
          val r = in.next()
          // Full prefix comparison against the current group's key.
          var i = 0
          var diff = -1
          while (diff < 0 && i < groupLen) {
            stats.columnComparisons += 1
            if (groupKey(i) != r.key(i)) diff = i
            i += 1
          }
          if (diff >= 0) {
            cur = r
            curBoundaryCode = Ovc.pack(groupLen, diff, r.key(diff))
            continue = false
          } else { count += 1; if (r.payload.nonEmpty) sum += r.payload(0) }
        }
        CodedRow(groupKey, groupCode, Array(count, sum))
      }
    }
}
