package repro.store

/** Block-delta compressed column (paper §7.1): values are grouped into
  * consecutive blocks of 128; each value is stored as the delta to the
  * minimum value of its block, bit-packed at the smallest width that fits
  * the block's largest delta. Access is O(1): locate the block, read the
  * packed delta, add the block minimum.
  */
final class BlockDeltaColumn private (
    val length: Int,
    blockMins: Array[Long],
    blockWidths: Array[Byte],
    blockOffsets: Array[Int], // offset (in 64-bit words) of each block's packed payload
    packed: Array[Long]
) {

  /** Decode the value at row `i` in constant time. */
  def apply(i: Int): Long = {
    val b = i >>> BlockDeltaColumn.BlockShift
    val w = blockWidths(b).toInt
    if (w == 0) blockMins(b)
    else {
      val inBlock = i & BlockDeltaColumn.BlockMask
      val bitPos = inBlock.toLong * w
      val word = blockOffsets(b) + (bitPos >>> 6).toInt
      val shift = (bitPos & 63).toInt
      val mask = if (w == 64) -1L else (1L << w) - 1
      val lo = packed(word) >>> shift
      val v =
        if (shift + w <= 64) lo & mask
        else (lo | (packed(word + 1) << (64 - shift))) & mask
      blockMins(b) + v
    }
  }

  /** Compressed size in bytes (payload + per-block metadata). */
  def compressedBytes: Long =
    packed.length.toLong * 8 + blockMins.length.toLong * 9 + blockOffsets.length.toLong * 4

  /** Uncompressed size in bytes. */
  def rawBytes: Long = length.toLong * 8

  /** Fraction of space saved vs the raw 64-bit encoding. */
  def compressionRatio: Double = 1.0 - compressedBytes.toDouble / rawBytes

  /** Materialize back to a plain array (tests). */
  def toArray: Array[Long] = Array.tabulate(length)(apply)
}

object BlockDeltaColumn {
  val BlockSize = 128
  private val BlockShift = 7
  private val BlockMask = BlockSize - 1

  private def bitsFor(maxDelta: Long): Int =
    if (maxDelta == 0) 0 else 64 - java.lang.Long.numberOfLeadingZeros(maxDelta)

  /** Compress a column. */
  def compress(values: Array[Long]): BlockDeltaColumn = {
    val n = values.length
    val nBlocks = (n + BlockSize - 1) / BlockSize
    val mins = new Array[Long](nBlocks)
    val widths = new Array[Byte](nBlocks)
    val offsets = new Array[Int](nBlocks)
    var words = 0
    var b = 0
    while (b < nBlocks) {
      val s = b * BlockSize
      val e = math.min(n, s + BlockSize)
      var mn = Long.MaxValue; var mx = Long.MinValue
      var i = s
      while (i < e) { val v = values(i); if (v < mn) mn = v; if (v > mx) mx = v; i += 1 }
      mins(b) = mn
      // deltas are non-negative; width covers the largest delta in the block
      val w = bitsFor(mx - mn)
      widths(b) = w.toByte
      offsets(b) = words
      words += ((e - s).toLong * w + 63).toInt / 64
      b += 1
    }
    val packed = new Array[Long](math.max(1, words + 1)) // +1 guard word for straddling reads
    b = 0
    while (b < nBlocks) {
      val s = b * BlockSize
      val e = math.min(n, s + BlockSize)
      val w = widths(b).toInt
      if (w > 0) {
        var i = s
        while (i < e) {
          val delta = values(i) - mins(b)
          val bitPos = (i - s).toLong * w
          val word = offsets(b) + (bitPos >>> 6).toInt
          val shift = (bitPos & 63).toInt
          packed(word) |= delta << shift
          if (shift + w > 64) packed(word + 1) |= delta >>> (64 - shift)
          i += 1
        }
      }
      b += 1
    }
    new BlockDeltaColumn(n, mins, widths, offsets, packed)
  }
}
