package repro.compress

/** Simplified Jacobson bit-vector rank index (paper §5.3, Fig. 7).
  *
  * Over a bit string of `n` positions it answers, in constant time,
  *  - `isSet(p)`: is position p non-NULL, and
  *  - `rank(p)`: the number of set bits strictly before p,
  * using (i) prefix sums stored every `c` positions with `m` bits each and
  * (ii) a static bit-string-position-count map `M` with 2^c * c cells where
  * `M(b, i)` is the number of 1s before the i-th bit of the c-length bit
  * string b.
  *
  * Defaults c = m = 16: a 1 MB static map shared by all instances, blocks of
  * 2^m = 64K elements per prefix-sum block, and m/c = 1 extra bit per
  * element on top of the 1-bit bit string.
  */
final class JacobsonIndex private (
    val c: Int,
    val m: Int,
    n: Int,
    chunks: Array[Int],      // one c-bit chunk of the bit string per cell
    prefixSums: Array[Long], // packed m-bit per-chunk prefix sums (block-relative)
    blockBases: Array[Long], // rank at the start of each 2^m-element block
    map: JacobsonIndex.PopcountMap
) extends Serializable {

  val length: Int = n

  def isSet(p: Int): Boolean = {
    val chunk = chunks(p / c)
    ((chunk >>> (p % c)) & 1) == 1
  }

  /** Number of set bits strictly before position p. Constant time. */
  def rank(p: Int): Long = {
    val chunkIdx = p / c
    val ps = readPrefixSum(chunkIdx)
    blockBases((p.toLong >>> m).toInt) + ps + map.onesBefore(chunks(chunkIdx), p % c)
  }

  private def readPrefixSum(chunkIdx: Int): Long = {
    // m-bit values packed little-endian into a long array.
    val bitPos = chunkIdx.toLong * m
    val word = (bitPos >>> 6).toInt
    val off = (bitPos & 63).toInt
    val lo = prefixSums(word) >>> off
    val v =
      if (off + m <= 64) lo
      else lo | (prefixSums(word + 1) << (64 - off))
    v & ((1L << m) - 1)
  }

  /** Overhead bytes: bit string + prefix sums + block bases. The static map
    * is shared process-wide, so it is reported separately (`mapBytes`).
    */
  def bytes: Long = {
    val bitStringBytes = (n.toLong + 7) / 8
    val prefixBytes = (((n.toLong + c - 1) / c) * m + 7) / 8
    val baseBytes = blockBases.length.toLong * 8
    bitStringBytes + prefixBytes + baseBytes
  }

  def mapBytes: Long = map.bytes
}

object JacobsonIndex {

  /** Static popcount map M: for each c-length bit string b and position i,
    * the number of 1s before bit i. Size 2^c * c cells of ceil(log2(c)/8)
    * bytes (1 byte for c <= 16). Shared (cached) per c.
    */
  final class PopcountMap private[JacobsonIndex] (val c: Int) extends Serializable {
    private val table: Array[Byte] = {
      val t = new Array[Byte]((1 << c) * c)
      var b = 0
      while (b < (1 << c)) {
        var ones = 0
        var i = 0
        while (i < c) {
          t(b * c + i) = ones.toByte
          if (((b >>> i) & 1) == 1) ones += 1
          i += 1
        }
        b += 1
      }
      t
    }
    def onesBefore(bits: Int, i: Int): Int = table(bits * c + i)
    def bytes: Long = (1L << c) * c
  }

  private val mapCache = new java.util.concurrent.ConcurrentHashMap[Int, PopcountMap]()
  def popcountMap(c: Int): PopcountMap =
    mapCache.computeIfAbsent(c, cc => new PopcountMap(cc))

  /** Build the index over `present`: present(p) == true means position p is
    * non-NULL. `c` must be <= 16 (the map grows as 2^c * c); `m` in 8..32.
    */
  def apply(present: Array[Boolean], c: Int = 16, m: Int = 16): JacobsonIndex = {
    require(c >= 1 && c <= 16, s"c=$c out of range (map would be 2^c*c bytes)")
    require(m >= 1 && m <= 32, s"m=$m out of range")
    require((1L << m) % c == 0, s"chunk size c=$c must divide block size 2^$m")
    val n = present.length
    val nChunks = (n + c - 1) / c
    val chunks = new Array[Int](math.max(1, nChunks))
    val psBits = nChunks.toLong * m
    val prefixSums = new Array[Long](((psBits + 63) / 64).toInt + 1)
    val blockSize = 1L << m
    val nBlocks = ((n.toLong + blockSize - 1) / blockSize).toInt
    val blockBases = new Array[Long](math.max(1, nBlocks))

    var rankTotal = 0L
    var blockRank = 0L
    var chunkIdx = 0
    while (chunkIdx < nChunks) {
      val chunkStart = chunkIdx.toLong * c
      if ((chunkStart & (blockSize - 1)) == 0) {
        blockBases((chunkStart >>> m).toInt) = rankTotal
        blockRank = 0L
      }
      writePrefixSum(prefixSums, chunkIdx, m, blockRank)
      var bits = 0
      var i = 0
      while (i < c) {
        val p = chunkIdx * c + i
        if (p < n && present(p)) {
          bits |= 1 << i
          rankTotal += 1
          blockRank += 1
        }
        i += 1
      }
      chunks(chunkIdx) = bits
      chunkIdx += 1
    }
    new JacobsonIndex(c, m, n, chunks, prefixSums, blockBases, popcountMap(c))
  }

  private def writePrefixSum(ps: Array[Long], chunkIdx: Int, m: Int, value: Long): Unit = {
    val masked = value & ((1L << m) - 1)
    val bitPos = chunkIdx.toLong * m
    val word = (bitPos >>> 6).toInt
    val off = (bitPos & 63).toInt
    ps(word) |= masked << off
    if (off + m > 64) ps(word + 1) |= masked >>> (64 - off)
  }
}
