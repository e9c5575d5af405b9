package repro.codecs.gpu

import repro.core._
import repro.codecs.cpu.NdzipCore

/** MPC [Yang et al., Cluster'15] — Massively Parallel Compression, a
  * synthesized four-component pipeline over 1024-element chunks:
  *
  *   1. LNV6s — subtract the 6th prior value within the chunk.
  *   2. BIT   — bit transpose (the i-th bits of all words, packed into words;
  *              the same operation as bitshuffle).
  *   3. LNV1s — subtract the previous word of the transposed stream.
  *   4. ZE    — a zero-word bitmap followed by the non-zero words.
  *
  * The word size (32/64-bit) must match the data precision so LNV6s computes
  * meaningful residuals — the "input word size information is important"
  * insight from the paper.
  */
final class Mpc extends Codec {
  override def name: String     = "MPC"
  override def platform: String = "GPU"

  private val Chunk = 1024

  override def compress(block: FpBlock): Compressed = {
    val w    = block.precision.bits
    val m    = NdzipCore.mask(w)
    val vals = block.bits
    val out  = new ByteBuf(vals.length * w / 8 / 2 + 64)
    var base = 0
    while (base < vals.length) {
      val len = math.min(Chunk, vals.length - base)
      // 1. LNV6s
      val r1 = new Array[Long](len)
      var i = 0
      while (i < len) {
        r1(i) = if (i < 6) vals(base + i) else (vals(base + i) - vals(base + i - 6)) & m
        i += 1
      }
      // 2. BIT transpose: (len values x w bits) -> (w planes x len bits), packed in w-bit words
      val t = bitTransposeForward(r1, len, w)
      // 3. LNV1s
      val r3 = new Array[Long](t.length)
      i = 0
      while (i < t.length) {
        r3(i) = if (i == 0) t(i) else (t(i) - t(i - 1)) & m
        i += 1
      }
      // 4. ZE
      val bitmapWords = (r3.length + w - 1) / w
      val bitmap      = new Array[Long](bitmapWords)
      i = 0
      while (i < r3.length) { if (r3(i) != 0) bitmap(i / w) |= 1L << (i % w); i += 1 }
      bitmap.foreach(writeWord(out, _, w))
      i = 0
      while (i < r3.length) { if (r3(i) != 0) writeWord(out, r3(i), w); i += 1 }
      base += len
    }
    val bytes = out.toByteArray
    // ~14 ops/byte: two delta passes + the bit transpose (DESIGN.md #2)
    val ops = block.sizeBytes * 14
    Compressed(bytes, WorkProfile(block.sizeBytes * 3, bytes.length, ops, divergent = false))
  }

  override def decompress(data: Array[Byte], precision: Precision, extent: Seq[Long]): Decompressed = {
    val w     = precision.bits
    val m     = NdzipCore.mask(w)
    val bytes = precision.bytes
    val n     = extent.product.toInt
    val vals  = new Array[Long](n)
    var pos   = 0
    var base  = 0
    while (base < n) {
      val len    = math.min(Chunk, n - base)
      // the transpose pads each bit plane to whole w-bit words
      val nWords = w * ((len + w - 1) / w)
      val bitmapWords = (nWords + w - 1) / w
      val bitmap      = new Array[Long](bitmapWords)
      var i = 0
      while (i < bitmapWords) { bitmap(i) = readWord(data, pos, w); pos += bytes; i += 1 }
      val r3 = new Array[Long](nWords)
      i = 0
      while (i < nWords) {
        r3(i) = if (((bitmap(i / w) >>> (i % w)) & 1L) != 0) { val v = readWord(data, pos, w); pos += bytes; v }
                else 0L
        i += 1
      }
      val t = new Array[Long](nWords)
      i = 0
      while (i < nWords) { t(i) = if (i == 0) r3(i) else (r3(i) + t(i - 1)) & m; i += 1 }
      val r1 = bitTransposeInverse(t, len, w)
      i = 0
      while (i < len) {
        vals(base + i) = if (i < 6) r1(i) else (r1(i) + vals(base + i - 6)) & m
        i += 1
      }
      base += len
    }
    val ops = n.toLong * bytes * 14
    Decompressed(FpBlock(precision, extent, vals),
                 WorkProfile(data.length + n.toLong * bytes, n.toLong * bytes, ops,
                             divergent = false))
  }

  /** Transpose an (len x w) bit matrix into w bit planes of len bits each,
    * packed into w-bit words MSB-plane first. Output length == len words.
    */
  private def bitTransposeForward(in: Array[Long], len: Int, w: Int): Array[Long] = {
    val wordsPerPlane = (len + w - 1) / w
    val out = new Array[Long](w * wordsPerPlane)
    var bit = 0
    while (bit < w) {
      val plane = w - 1 - bit // MSB plane first, per the paper
      var i = 0
      while (i < len) {
        if (((in(i) >>> bit) & 1L) != 0)
          out(plane * wordsPerPlane + i / w) |= 1L << (i % w)
        i += 1
      }
      bit += 1
    }
    out // length w * wordsPerPlane (== len when w divides len; padded otherwise)
  }

  private def bitTransposeInverse(t: Array[Long], len: Int, w: Int): Array[Long] = {
    val wordsPerPlane = (len + w - 1) / w
    val out = new Array[Long](len)
    var bit = 0
    while (bit < w) {
      val plane = w - 1 - bit
      var i = 0
      while (i < len) {
        if (((t(plane * wordsPerPlane + i / w) >>> (i % w)) & 1L) != 0)
          out(i) |= 1L << bit
        i += 1
      }
      bit += 1
    }
    out
  }

  private def writeWord(out: ByteBuf, v: Long, w: Int): Unit = {
    var i = 0
    while (i < w / 8) { out.write(((v >>> (8 * i)) & 0xff).toInt); i += 1 }
  }

  private def readWord(data: Array[Byte], off: Int, w: Int): Long = {
    var v = 0L
    var i = 0
    while (i < w / 8) { v |= (data(off + i) & 0xffL) << (8 * i); i += 1 }
    v
  }
}
