package repro.compress

import repro.util.ByteWidthArray

/** NULL-compressed long column (paper §5.3): non-NULL values packed
  * consecutively + a Jacobson rank index over the presence bit string.
  * `get(p)` is constant time: one bit probe + one rank + one value read.
  */
final class NullCompressedColumn private (
    index: JacobsonIndex,
    values: ByteWidthArray,
    val nullValue: Long
) extends Serializable {

  def length: Int = index.length

  def isNull(p: Int): Boolean = !index.isSet(p)

  /** Value at p, or `nullValue` when p is NULL. */
  def get(p: Int): Long =
    if (index.isSet(p)) values.get(index.rank(p).toInt) else nullValue

  def bytes: Long = index.bytes + values.bytes
  def indexBytes: Long = index.bytes
}

object NullCompressedColumn {
  final val Null: Long = Long.MinValue

  /** Build from a dense column where `Null` marks missing entries.
    * `suppress` controls whether values get leading-0 suppression (the
    * +0-SUPR step) or stay at 8 bytes.
    */
  def apply(dense: Array[Long], c: Int = 16, m: Int = 16,
            suppress: Boolean = true, nullValue: Long = Null): NullCompressedColumn = {
    val present = new Array[Boolean](dense.length)
    var count = 0
    var i = 0
    while (i < dense.length) {
      if (dense(i) != nullValue) { present(i) = true; count += 1 }
      i += 1
    }
    val packed = new Array[Long](count)
    var j = 0
    i = 0
    while (i < dense.length) {
      if (present(i)) { packed(j) = dense(i); j += 1 }
      i += 1
    }
    val vals = if (suppress) ByteWidthArray(packed) else ByteWidthArray.at(packed, 8)
    new NullCompressedColumn(JacobsonIndex(present, c, m), vals, nullValue)
  }
}

/** Abadi's vanilla bit-string scheme (paper §5.3 baseline): presence bits +
  * packed values, but NO rank index — `get(p)` must popcount-scan the bit
  * words from the start of the column. Linear time; this is the design the
  * paper shows is >20x slower and replaces with the Jacobson index.
  */
final class VanillaNullColumn private (
    bits: Array[Long],
    n: Int,
    values: ByteWidthArray,
    val nullValue: Long
) extends Serializable {

  def length: Int = n

  def isNull(p: Int): Boolean = ((bits(p >>> 6) >>> (p & 63)) & 1L) == 0

  def get(p: Int): Long = {
    if (isNull(p)) return nullValue
    var rank = 0
    val word = p >>> 6
    var w = 0
    while (w < word) { rank += java.lang.Long.bitCount(bits(w)); w += 1 }
    rank += java.lang.Long.bitCount(bits(word) & ((1L << (p & 63)) - 1))
    values.get(rank)
  }

  def bytes: Long = bits.length.toLong * 8 + values.bytes
}

object VanillaNullColumn {
  def apply(dense: Array[Long], nullValue: Long = NullCompressedColumn.Null): VanillaNullColumn = {
    val n = dense.length
    val bits = new Array[Long]((n + 63) / 64 + 1)
    var count = 0
    var i = 0
    while (i < n) {
      if (dense(i) != nullValue) { bits(i >>> 6) |= 1L << (i & 63); count += 1 }
      i += 1
    }
    val packed = new Array[Long](count)
    var j = 0
    i = 0
    while (i < n) {
      if (dense(i) != nullValue) { packed(j) = dense(i); j += 1 }
      i += 1
    }
    new VanillaNullColumn(bits, n, ByteWidthArray(packed), nullValue)
  }
}
