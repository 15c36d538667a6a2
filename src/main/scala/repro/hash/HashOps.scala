package repro.hash

import java.nio.file.Path

import scala.collection.mutable

import repro.core.{CodedRow, ERow, OvcStats}
import repro.sort.{RunFile, SpillStats}

/** Hashable wrapper for a key array; computing the hash touches every column
  * (charged to `OvcStats.hashColumnAccesses` by callers), mirroring the
  * paper's point that hash-based execution needs N*K column accesses for the
  * hash function alone.
  */
final class LongsKey(val xs: Array[Long]) {
  override val hashCode: Int = {
    var h = 1
    var i = 0
    while (i < xs.length) { h = 31 * h + java.lang.Long.hashCode(xs(i) * 0x9e3779b97f4a7c15L); i += 1 }
    h
  }
  override def equals(o: Any): Boolean = o match {
    case k: LongsKey => java.util.Arrays.equals(xs, k.xs)
    case _ => false
  }
}

/** Level-salted spill-partition selection: recursion levels must not reuse
  * the parent's partitioning function, or an oversized partition would map
  * back into a single bucket and never shrink.
  */
private[hash] object SpillPart {
  def apply(h: Int, level: Int, nParts: Int): Int = {
    val mixed = Integer.rotateRight(h * 0x9e3779b9 + level * 0x85ebca77, level * 5 + 1)
    (mixed >>> 1) % nParts
  }
}

/** Grace hash aggregation (group-count) with a bounded in-memory hash table
  * and partitioned spill to local files — the "hash aggregation" blocking
  * operators of the paper's Figure 2 hash plan.
  */
object HashAgg {

  val SpillPartitions: Int = 16

  /** Count rows per distinct key. Absorbs rows whose group is already (or
    * still fits) in memory; once the table holds `memGroups` groups, rows of
    * unseen groups spill to one of [[SpillPartitions]] files, processed
    * recursively after the input drains.
    */
  def groupCount(input: Iterator[ERow], arity: Int, memGroups: Int,
                 spill: SpillStats, stats: OvcStats,
                 tmpDir: Path = null, level: Int = 0): Iterator[ERow] = {
    require(memGroups > 0)
    val dir = if (tmpDir != null) tmpDir else RunFile.newTempDir("hash-agg")
    val map = new mutable.HashMap[LongsKey, Array[Long]]()

    // Buffer spill rows per partition in small batches, flushing through
    // RunFile so spill accounting and file I/O are real.
    val batches = Array.fill(SpillPartitions)(new mutable.ArrayBuffer[ERow]())
    val files = Array.fill(SpillPartitions)(mutable.ArrayBuffer.empty[Path])
    def flush(p: Int): Unit =
      if (batches(p).nonEmpty) {
        files(p) += RunFile.write(dir, arity, 1,
          batches(p).iterator.map(r => CodedRow(r.key, 0L, Array(weight(r)))), spill)
        batches(p).clear()
      }

    def weight(r: ERow): Long = if (r.payload.nonEmpty) r.payload(0) else 1L

    input.foreach { r =>
      stats.hashColumnAccesses += arity // hash function touches every column
      val k = new LongsKey(r.key)
      map.get(k) match {
        case Some(cell) => cell(0) += weight(r)
        case None =>
          if (map.size < memGroups) map.put(k, Array(weight(r)))
          else {
            val p = SpillPart(k.hashCode, level, SpillPartitions)
            batches(p) += r
            if (batches(p).size >= 65536) flush(p)
          }
      }
    }

    val inMemory = map.iterator.map { case (k, cell) => ERow(k.xs, Array(cell(0))) }
    var result = inMemory
    var p = 0
    while (p < SpillPartitions) {
      flush(p)
      val partFiles = files(p).toVector
      if (partFiles.nonEmpty) {
        // Lazily recurse into each spilled partition once reached.
        result = result ++ new Iterator[ERow] {
          private lazy val inner: Iterator[ERow] = {
            val rows = partFiles.iterator.flatMap(f =>
              RunFile.reader(f, arity, 1).map(c => ERow(c.key, c.payload)))
            groupCount(rows, arity, memGroups, spill, stats, dir, level + 1)
          }
          override def hasNext: Boolean = inner.hasNext
          override def next(): ERow = inner.next()
        }
      }
      p += 1
    }
    result
  }
}

/** Grace hash (semi) join with a bounded build table — the "hash join"
  * blocking operator of the paper's Figure 2 hash plan. If the build side
  * exceeds memory, both sides are partitioned to local files (each row spilled
  * once) and the partitions are joined recursively.
  */
object HashJoin {

  val SpillPartitions: Int = 16

  /** Emit each probe row whose key occurs in the build input (both sides are
    * assumed distinct on the full key, as after duplicate removal).
    */
  def semiJoin(build: Iterator[ERow], probe: Iterator[ERow], arity: Int,
               memRows: Int, spill: SpillStats, stats: OvcStats,
               tmpDir: Path = null, level: Int = 0): Iterator[ERow] = {
    require(memRows > 0)
    val dir = if (tmpDir != null) tmpDir else RunFile.newTempDir("hash-join")

    val inMem = new mutable.ArrayBuffer[ERow]()
    var overflow = false
    while (!overflow && build.hasNext) {
      inMem += build.next()
      if (inMem.size > memRows) overflow = true
    }

    if (!overflow) {
      val set = new mutable.HashSet[LongsKey]()
      inMem.foreach { r => stats.hashColumnAccesses += arity; set += new LongsKey(r.key) }
      probe.filter { r =>
        stats.hashColumnAccesses += arity
        set.contains(new LongsKey(r.key))
      }
    } else {
      def partition(rows: Iterator[ERow]): Array[Vector[Path]] = {
        val batches = Array.fill(SpillPartitions)(new mutable.ArrayBuffer[ERow]())
        val files = Array.fill(SpillPartitions)(mutable.ArrayBuffer.empty[Path])
        def flush(p: Int): Unit =
          if (batches(p).nonEmpty) {
            files(p) += RunFile.write(dir, arity, 1,
              batches(p).iterator.map(r =>
                CodedRow(r.key, 0L, if (r.payload.isEmpty) Array(0L) else Array(r.payload(0)))),
              spill)
            batches(p).clear()
          }
        rows.foreach { r =>
          stats.hashColumnAccesses += arity
          val p = SpillPart(new LongsKey(r.key).hashCode, level, SpillPartitions)
          batches(p) += r
          if (batches(p).size >= 65536) flush(p)
        }
        (0 until SpillPartitions).foreach(flush)
        files.map(_.toVector)
      }

      val buildParts = partition(inMem.iterator ++ build)
      val probeParts = partition(probe)

      (0 until SpillPartitions).iterator.flatMap { p =>
        val b = buildParts(p).iterator.flatMap(f => RunFile.reader(f, arity, 1).map(c => ERow(c.key, c.payload)))
        val q = probeParts(p).iterator.flatMap(f => RunFile.reader(f, arity, 1).map(c => ERow(c.key, c.payload)))
        semiJoin(b, q, arity, memRows, spill, stats, dir, level + 1)
      }
    }
  }
}
