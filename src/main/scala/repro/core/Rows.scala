package repro.core

/** An engine row: a fixed-arity sort key plus an opaque payload. */
final case class ERow(key: Array[Long], payload: Array[Long]) {
  override def toString: String =
    s"ERow(${key.mkString("[", ",", "]")}, ${payload.mkString("[", ",", "]")})"
}

object ERow {
  val NoPayload: Array[Long] = Array.emptyLongArray
  def apply(key: Array[Long]): ERow = ERow(key, NoPayload)
}

/** A row in a sorted, offset-value-coded stream: `code` is the packed
  * ascending OVC of `key` relative to the stream's previous row (or the
  * implicit "-inf" base for the first row).
  */
final case class CodedRow(key: Array[Long], code: Long, payload: Array[Long]) {
  def offset(arity: Int): Int = Ovc.offsetOf(code, arity)
  override def toString: String =
    s"CodedRow(${key.mkString("[", ",", "]")}, code=$code, ${payload.mkString("[", ",", "]")})"
}

/** Invariant checks shared by tests and debug assertions. */
object OvcInvariants {

  /** Verify a coded stream: ascending key order and a consistent OVC chain
    * (each code equals the re-derived code relative to the predecessor; the
    * first code is the code relative to "-inf"). Throws on violation.
    */
  def verifyChain(rows: Iterable[CodedRow], arity: Int): Unit = {
    val junk = new OvcStats
    var prev: Array[Long] = null
    var i = 0
    rows.foreach { r =>
      require(r.key.length == arity, s"row $i: key arity ${r.key.length} != $arity")
      val expect = if (prev == null) Ovc.initial(r.key) else Ovc.encode(prev, r.key, junk)
      require(r.code == expect,
        s"row $i: code ${r.code} != expected $expect " +
        s"(offset=${Ovc.offsetOf(r.code, arity)} vs ${Ovc.offsetOf(expect, arity)}) for $r")
      if (prev != null)
        require(Ovc.compareKeys(prev, r.key, junk) <= 0, s"row $i out of order: $r")
      prev = r.key
      i += 1
    }
  }
}

/** Deterministic generators for engine tests and benchmarks. */
object DataGen {

  /** Random rows: `arity` key columns, each uniform in [0, distinctPerCol). */
  def randomRows(n: Int, arity: Int, distinctPerCol: Int, seed: Long,
                 payloadArity: Int = 0): Array[ERow] = {
    val rnd = new scala.util.Random(seed)
    Array.fill(n) {
      val key = Array.fill(arity)(rnd.nextInt(distinctPerCol).toLong)
      val pay = if (payloadArity == 0) ERow.NoPayload else Array.fill(payloadArity)(rnd.nextLong() & 0xffff)
      ERow(key, pay)
    }
  }

  /** Composite key for integer id: mixed-radix digits, most significant first.
    * Order-preserving: id1 < id2 iff key(id1) < key(id2) lexicographically.
    */
  def compositeKey(id: Long, arity: Int, base: Long): Array[Long] = {
    val key = new Array[Long](arity)
    var v = id
    var i = arity - 1
    while (i >= 0) { key(i) = v % base; v /= base; i -= 1 }
    key
  }

  /** Figure 1 input: `n` rows sorted ascending, exactly `n/ratio` groups of
    * size `ratio`, keys with `arity` small-domain int64 columns (the paper's
    * "many key columns, few distinct values"). Codes come from a prefix scan,
    * i.e. an ordered scan originating OVCs (§4.10).
    */
  def groupedSortedCoded(n: Int, ratio: Int, arity: Int): Array[CodedRow] = {
    val groups = math.max(1, n / ratio)
    val base = math.max(2L, math.ceil(math.pow(groups.toDouble, 1.0 / arity)).toLong)
    val out = new Array[CodedRow](n)
    val junk = new OvcStats
    var prev: Array[Long] = null
    var i = 0
    var g = 0L
    while (i < n) {
      val key = compositeKey(g, arity, base)
      var j = 0
      while (j < ratio && i < n) {
        val code = if (prev == null) Ovc.initial(key) else Ovc.encode(prev, key, junk)
        out(i) = CodedRow(key, code, ERow.NoPayload)
        prev = key
        i += 1; j += 1
      }
      g += 1
    }
    out
  }

  /** Attach reference codes to already-sorted keys (ordered-scan style). */
  def codeSorted(keys: IndexedSeq[Array[Long]],
                 payloads: IndexedSeq[Array[Long]] = null): Vector[CodedRow] = {
    val junk = new OvcStats
    var prev: Array[Long] = null
    val b = Vector.newBuilder[CodedRow]
    var i = 0
    while (i < keys.length) {
      val k = keys(i)
      val code = if (prev == null) Ovc.initial(k) else Ovc.encode(prev, k, junk)
      b += CodedRow(k, code, if (payloads == null) ERow.NoPayload else payloads(i))
      prev = k
      i += 1
    }
    b.result()
  }

  /** Reference sort (stable timsort on full key) + reference coding. */
  def refSortCoded(rows: Iterable[ERow]): Vector[CodedRow] = {
    val junk = new OvcStats
    val arr = rows.toArray
    val sorted = arr.sortWith((a, b) => Ovc.compareKeys(a.key, b.key, junk) < 0)
    codeSorted(sorted.map(_.key).toIndexedSeq, sorted.map(_.payload).toIndexedSeq)
  }
}
