package repro.sort

import java.nio.file.Path

import repro.core.{CodedRow, ERow, Ovc, OvcStats}

/** External merge sort with tree-of-losers priority queues and offset-value
  * coding (paper §3, §5): run generation merges single-row runs (so OVCs in
  * each spilled run are a by-product), runs spill to real local files, and a
  * (possibly multi-level) merge with a loser tree produces the sorted, coded
  * output stream.
  *
  * With `dedup = true` this is the paper's "in-sort aggregation" for duplicate
  * removal [10]: rows whose code has offset == arity are dropped both before
  * spilling (run generation) and in every merge, so duplicates are never
  * spilled twice and the final stream is distinct. Dropping a duplicate never
  * perturbs the code chain because the duplicate code 0 is the identity of the
  * max-fold of §4.1.
  */
object ExternalSort {

  val DefaultFanIn: Int = 512

  /** Sort `input`; returns the sorted coded stream.
    *
    * @param memRows  rows that fit in "memory" — the run-generation chunk size
    * @param dedup    drop duplicate rows as early as possible (in-sort dedup)
    * @param fanIn    maximum merge fan-in before an extra merge level is added
    */
  def sort(input: Iterator[ERow], arity: Int, payloadArity: Int, memRows: Int,
           stats: OvcStats, spill: SpillStats, dedup: Boolean = false,
           fanIn: Int = DefaultFanIn, tmpDir: Path = null): Iterator[CodedRow] = {
    require(memRows > 0, "memRows must be positive")
    val chunks = input.grouped(memRows)
    if (!chunks.hasNext) return Iterator.empty

    val first = chunks.next()
    if (!chunks.hasNext) return genRun(first, arity, stats, dedup) // fits in memory: no spill

    val dir = if (tmpDir != null) tmpDir else RunFile.newTempDir("ovc-sort")
    var runs = Vector(RunFile.write(dir, arity, payloadArity, genRun(first, arity, stats, dedup), spill))
    while (chunks.hasNext)
      runs :+= RunFile.write(dir, arity, payloadArity, genRun(chunks.next(), arity, stats, dedup), spill)

    // Intermediate merge levels only when the run count exceeds the fan-in.
    while (runs.size > fanIn) {
      spill.mergeLevels += 1
      runs = runs
        .grouped(fanIn)
        .map { g =>
          val merged = dedupFilter(
            new LoserTree(g.map(p => RunFile.reader(p, arity, payloadArity)), arity, stats),
            dedup)
          RunFile.write(dir, arity, payloadArity, merged, spill)
        }
        .toVector
    }

    dedupFilter(
      new LoserTree(runs.map(p => RunFile.reader(p, arity, payloadArity)), arity, stats),
      dedup)
  }

  /** Run generation: merge `chunk.size` single-row runs with a loser tree.
    * Every input row enters coded relative to "-inf" (offset 0); the tree's
    * output is a sorted run with a valid OVC chain.
    */
  private def genRun(chunk: Seq[ERow], arity: Int, stats: OvcStats,
                     dedup: Boolean): Iterator[CodedRow] = {
    if (chunk.isEmpty) return Iterator.empty
    val singles = chunk.iterator.map { r =>
      Iterator.single(CodedRow(r.key, Ovc.initial(r.key), r.payload))
    }.toIndexedSeq
    dedupFilter(new LoserTree(singles, arity, stats), dedup)
  }

  private def dedupFilter(it: Iterator[CodedRow], dedup: Boolean): Iterator[CodedRow] =
    if (dedup) it.filterNot(r => Ovc.isDup(r.code)) else it
}
