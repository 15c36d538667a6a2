package repro

import repro.core.{CodedRow, DataGen, ERow, Ovc, OvcStats}
import repro.ops.JoinType

/** Naive reference implementations the engine is checked against. */
object Ref {

  def keyOrdering: Ordering[Array[Long]] = (a: Array[Long], b: Array[Long]) => {
    val junk = new OvcStats
    Ovc.compareKeys(a, b, junk)
  }

  /** Stable full sort + predecessor coding. */
  def sortCoded(rows: Iterable[ERow]): Vector[CodedRow] = DataGen.refSortCoded(rows)

  /** Distinct keys of a row set, in sorted order. */
  def distinctSorted(rows: Iterable[ERow]): Vector[Vector[Long]] =
    rows.map(_.key.toVector).toVector.distinct.sorted(Ordering.Implicits.seqOrdering[Vector, Long])

  /** Group counts over the first `groupLen` key columns. */
  def groupCount(rows: Iterable[ERow], groupLen: Int): Map[Vector[Long], Long] =
    rows.groupBy(_.key.take(groupLen).toVector).map { case (k, v) => k -> v.size.toLong }

  /** Reference merge join output: left rows in stable sorted order, each
    * matched against right rows (in stable sorted order) on the first
    * `joinLen` columns. Returns (key, payload) pairs in expected output order.
    */
  def joinRef(left: Seq[ERow], right: Seq[ERow], joinLen: Int, jt: JoinType,
              rightArity: Int, rightPayloadArity: Int,
              nullSentinel: Long = Long.MinValue): Vector[(Vector[Long], Vector[Long])] = {
    val junk = new OvcStats
    val ls = left.sortWith((a, b) => Ovc.compareKeys(a.key, b.key, junk) < 0)
    val rs = right.sortWith((a, b) => Ovc.compareKeys(a.key, b.key, junk) < 0)
    val out = Vector.newBuilder[(Vector[Long], Vector[Long])]
    ls.foreach { l =>
      val matches = rs.filter(r => java.util.Arrays.equals(l.key.take(joinLen), r.key.take(joinLen)))
      jt match {
        case JoinType.LeftSemi =>
          if (matches.nonEmpty) out += ((l.key.toVector, l.payload.toVector))
        case JoinType.LeftAnti =>
          if (matches.isEmpty) out += ((l.key.toVector, l.payload.toVector))
        case JoinType.Inner =>
          matches.foreach { r =>
            out += ((l.key.toVector,
                     l.payload.toVector ++ r.key.drop(joinLen).toVector ++ r.payload.toVector))
          }
        case JoinType.LeftOuter =>
          if (matches.isEmpty)
            out += ((l.key.toVector,
                     l.payload.toVector ++
                     Vector.fill((rightArity - joinLen) + rightPayloadArity)(nullSentinel)))
          else
            matches.foreach { r =>
              out += ((l.key.toVector,
                       l.payload.toVector ++ r.key.drop(joinLen).toVector ++ r.payload.toVector))
            }
      }
    }
    out.result()
  }
}
