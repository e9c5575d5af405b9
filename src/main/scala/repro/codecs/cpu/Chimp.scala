package repro.codecs.cpu

import repro.core._

/** Chimp128 [Liakos et al., VLDB'22] — Gorilla's XOR scheme with (a) control
  * codes redesigned for residuals with few trailing zeros and (b) a 128-entry
  * table of previous values indexed by their low bits, so each value XORs
  * against the *best* of the last 128 values rather than only the previous.
  *
  * Control codes (2 bits):
  *   - `00` : value identical to the indexed previous value — store its 7-bit
  *            ring index
  *   - `01` : trailing zeros of the XOR against the indexed value exceed the
  *            threshold — store 7-bit index, 3-bit rounded leading-zero code,
  *            significant-bit length, then the center bits
  *   - `10` : XOR against the immediately previous value, leading zeros equal
  *            the stored ones — store the (w - lz) low bits
  *   - `11` : same but new leading-zero count — store 3-bit code then bits
  */
final class Chimp extends Codec {
  override def name: String     = "Chimp"
  override def platform: String = "CPU"

  private val PrevValues    = 128
  private val PrevLog2      = 7
  private val TrailThreshold = 6 + PrevLog2 // 13, per the Chimp128 reference impl

  // Leading-zero counts are rounded down to one of 8 buckets (3-bit code).
  private val LeadBuckets = Array(0, 8, 12, 16, 18, 20, 22, 24)
  private def leadCode(lz: Int): Int = {
    var c = LeadBuckets.length - 1
    while (LeadBuckets(c) > lz) c -= 1
    c
  }

  override def compress(block: FpBlock): Compressed = {
    val w       = block.precision.bits
    val lenBits = if (w == 64) 6 else 5
    val out     = new BitWriter(block.n * block.precision.bytes / 2 + 64)
    val vals    = block.bits
    val stored  = new Array[Long](PrevValues)
    val indices = new Array[Int](1 << (TrailThreshold + 1))
    java.util.Arrays.fill(indices, -PrevValues - 1)
    var storedLz = Int.MaxValue
    var ops      = 0L

    var i = 0
    while (i < vals.length) {
      val v = vals(i)
      if (i == 0) out.writeBits(v, w)
      else {
        val key = (v & ((1L << (TrailThreshold + 1)) - 1)).toInt
        var refIdx = (i - 1) % PrevValues // default: immediately previous value
        var viaTable = false
        if (i - indices(key) <= PrevValues && indices(key) >= 0) {
          val cand = indices(key) % PrevValues
          val xorC = (v ^ stored(cand)) & mask(w)
          if (xorC == 0 || java.lang.Long.numberOfTrailingZeros(xorC) > TrailThreshold) {
            refIdx = cand; viaTable = true
          }
        }
        val xor = (v ^ stored(refIdx)) & mask(w)
        if (viaTable) {
          if (xor == 0) {
            out.writeBits(0L, 2) // 00
            out.writeBits(refIdx.toLong, PrevLog2)
          } else {
            val lz  = leadBucketOf(xor, w)
            val tz  = java.lang.Long.numberOfTrailingZeros(xor)
            val sig = w - lz - tz
            out.writeBits(1L, 2) // 01
            out.writeBits(refIdx.toLong, PrevLog2)
            out.writeBits(leadCode(lz).toLong, 3)
            out.writeBits(sig.toLong, lenBits)
            out.writeBits(xor >>> tz, sig)
          }
          storedLz = Int.MaxValue
        } else {
          // xor against previous value; trailing zeros <= threshold
          val lz = leadBucketOf(xor, w)
          if (lz == storedLz) {
            out.writeBits(2L, 2) // 10
            out.writeBits(xor, w - lz)
          } else {
            storedLz = lz
            out.writeBits(3L, 2) // 11
            out.writeBits(leadCode(lz).toLong, 3)
            out.writeBits(xor, w - lz)
          }
        }
      }
      stored(i % PrevValues) = v
      val key2 = (v & ((1L << (TrailThreshold + 1)) - 1)).toInt
      indices(key2) = i
      ops += 18
      i += 1
    }
    Compressed(out.toArray,
               WorkProfile(block.sizeBytes, out.sizeBytes, ops, divergent = false))
  }

  override def decompress(data: Array[Byte], precision: Precision, extent: Seq[Long]): Decompressed = {
    val w       = precision.bits
    val lenBits = if (w == 64) 6 else 5
    val n       = extent.product.toInt
    val in      = new BitReader(data)
    val vals    = new Array[Long](n)
    val stored  = new Array[Long](PrevValues)
    var storedLz = Int.MaxValue
    var i = 0
    while (i < n) {
      val v =
        if (i == 0) in.readBits(w)
        else in.readBits(2).toInt match {
          case 0 =>
            stored(in.readBits(PrevLog2).toInt)
          case 1 =>
            val refIdx = in.readBits(PrevLog2).toInt
            val lz     = LeadBuckets(in.readBits(3).toInt)
            val sig    = in.readBits(lenBits).toInt
            val tz     = w - lz - sig
            storedLz = Int.MaxValue
            stored(refIdx) ^ (in.readBits(sig) << tz)
          case 2 =>
            stored((i - 1) % PrevValues) ^ in.readBits(w - storedLz)
          case _ =>
            storedLz = LeadBuckets(in.readBits(3).toInt)
            stored((i - 1) % PrevValues) ^ in.readBits(w - storedLz)
        }
      vals(i) = v & mask(w)
      stored(i % PrevValues) = vals(i)
      i += 1
    }
    Decompressed(FpBlock(precision, extent, vals),
                 WorkProfile(data.length, n.toLong * precision.bytes, n.toLong * 12, divergent = false))
  }

  private def mask(w: Int): Long = if (w == 64) -1L else (1L << w) - 1

  /** Leading-zero count of x in a w-bit word, rounded down to a bucket value. */
  private def leadBucketOf(x: Long, w: Int): Int = {
    val lz = java.lang.Long.numberOfLeadingZeros(x) - (64 - w)
    LeadBuckets(leadCode(math.min(lz, LeadBuckets.last)))
  }
}
