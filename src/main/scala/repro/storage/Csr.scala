package repro.storage

import repro.compress.JacobsonIndex
import repro.core.Values
import repro.util.ByteWidthArray

/** Offset level of a 2-level CSR (paper Fig. 3), optionally NULL-compressed:
  * the paper treats empty adjacency lists as NULLs and stores list starts
  * only for non-empty vertices behind a Jacobson rank index (§5.3).
  */
sealed trait CsrOffsets extends Serializable {
  def numVertices: Int
  /** Start slot of v's list (undefined when empty — check `isEmpty`). */
  def start(v: Int): Int
  def end(v: Int): Int
  def isEmptyList(v: Int): Boolean
  def bytes: Long
}

final class PlainOffsets(off: ByteWidthArray) extends CsrOffsets {
  def numVertices: Int = off.length - 1
  def start(v: Int): Int = off.get(v).toInt
  def end(v: Int): Int = off.get(v + 1).toInt
  def isEmptyList(v: Int): Boolean = off.get(v) == off.get(v + 1)
  def bytes: Long = off.bytes
}

final class CompressedOffsets(idx: JacobsonIndex, starts: ByteWidthArray) extends CsrOffsets {
  def numVertices: Int = idx.length
  def start(v: Int): Int = starts.get(idx.rank(v).toInt).toInt
  def end(v: Int): Int = starts.get(idx.rank(v).toInt + 1).toInt
  def isEmptyList(v: Int): Boolean = !idx.isSet(v)
  def bytes: Long = idx.bytes + starts.bytes
}

/** Engine-facing adjacency index for one (edge label, direction). */
sealed trait Adjacency extends Serializable {
  def bytes: Long
}

/** 2-level CSR: offsets + neighbour offsets (+ optional per-edge values:
  * global edge IDs under the old ID scheme, page-level positional offsets
  * under the new one, or omitted entirely when the decision tree of Fig. 6
  * allows).
  */
final class CsrAdjacency(
    val offsets: CsrOffsets,
    val nbrs: ByteWidthArray,
    val edgeVals: ByteWidthArray // null when omitted
) extends Adjacency {
  def numVertices: Int = offsets.numVertices
  def numEdges: Int = nbrs.length
  @inline def start(v: Int): Int = if (offsets.isEmptyList(v)) -1 else offsets.start(v)
  @inline def end(v: Int): Int = offsets.end(v)
  @inline def nbr(i: Int): Long = nbrs.get(i)
  @inline def edgeVal(i: Int): Long = if (edgeVals == null) 0L else edgeVals.get(i)
  def hasEdgeVals: Boolean = edgeVals != null
  def bytes: Long = offsets.bytes + nbrs.bytes + (if (edgeVals == null) 0L else edgeVals.bytes)
}

/** Single-cardinality adjacency stored as a vertex column (paper §4.1.2):
  * `nbr(v)` is the single neighbour of v, or [[Values.Null]].
  */
final class SingleAdjacency(val col: VColumn) extends Adjacency {
  def numVertices: Int = col.length
  @inline def nbr(v: Int): Long = col.get(v)
  def bytes: Long = col.bytes
}

object CsrAdjacency {

  /** Build CSR offsets from per-vertex list lengths.
    *
    * @param nullCompress compress offsets when the empty-list fraction
    *                     exceeds `threshold`
    * @param suppress     leading-0 suppression of the offset values
    */
  def buildOffsets(listLens: Array[Int], suppress: Boolean, nullCompress: Boolean,
                   threshold: Double, c: Int, m: Int): CsrOffsets = {
    val n = listLens.length
    var empties = 0
    var i = 0
    while (i < n) { if (listLens(i) == 0) empties += 1; i += 1 }
    val emptyFrac = if (n == 0) 0.0 else empties.toDouble / n
    if (nullCompress && emptyFrac > threshold) {
      val present = new Array[Boolean](n)
      var nonEmpty = 0
      i = 0
      while (i < n) { if (listLens(i) > 0) { present(i) = true; nonEmpty += 1 }; i += 1 }
      val starts = new Array[Long](nonEmpty + 1)
      var acc = 0L
      var j = 0
      i = 0
      while (i < n) {
        if (present(i)) { starts(j) = acc; j += 1 }
        acc += listLens(i)
        i += 1
      }
      starts(nonEmpty) = acc
      val enc = if (suppress) ByteWidthArray(starts) else ByteWidthArray.at(starts, 8)
      new CompressedOffsets(JacobsonIndex(present, c, m), enc)
    } else {
      val off = new Array[Long](n + 1)
      var acc = 0L
      i = 0
      while (i < n) { off(i) = acc; acc += listLens(i); i += 1 }
      off(n) = acc
      val enc = if (suppress) ByteWidthArray(off) else ByteWidthArray.at(off, 8)
      new PlainOffsets(enc)
    }
  }
}
