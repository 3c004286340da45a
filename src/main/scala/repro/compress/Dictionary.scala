package repro.compress

/** Fixed-length dictionary encoding (paper §5.1): a categorical string
  * domain of z values maps to ceil(log2(z)/8)-byte codes. Codes are dense
  * ints [0, z); predicate constants are translated to code sets once per
  * query, so scans compare fixed-width integers and never decode.
  */
final class Dictionary private (val words: Array[String]) extends Serializable {
  private val codeOf: Map[String, Int] = words.zipWithIndex.toMap

  def size: Int = words.length
  def decode(code: Int): String = words(code)
  def encode(s: String): Int = codeOf(s)
  def encodeOpt(s: String): Option[Int] = codeOf.get(s)

  /** Codes of all dictionary words satisfying `pred` (e.g. CONTAINS). */
  def codesWhere(pred: String => Boolean): Set[Long] =
    words.iterator.zipWithIndex.collect { case (w, i) if pred(w) => i.toLong }.toSet

  /** Bytes per code after leading-0 suppression. */
  def codeWidth: Int = repro.util.ByteWidthArray.widthFor(math.max(0, size - 1).toLong)

  /** Dictionary heap cost: per-word string bytes + offsets. */
  def bytes: Long = words.iterator.map(w => 4L + w.length.toLong).sum
}

object Dictionary {
  def fromValues(values: Iterator[String]): Dictionary = {
    val distinct = values.filter(_ != null).toArray.distinct.sorted
    new Dictionary(distinct)
  }
  def apply(words: Seq[String]): Dictionary = new Dictionary(words.toArray.distinct.sorted)
}
