package repro.codecs.cpu

import repro.core._

/** fpzip [Lindstrom & Isenburg, TVCG'06] — Lorenzo-predicted residual coding.
  *
  * 1. Map each IEEE bit pattern to an order-preserving sign-magnitude integer
  *    (negative values bit-complemented, positives offset by the sign bit) so
  *    integer subtraction of prediction and actual is meaningful and lossless.
  * 2. Predict each value from its previously-encoded hypercube neighbors with
  *    the Lorenzo predictor (1-, 2- or 3-D); boundary values fall back to the
  *    scan-order predecessor.
  * 3. Range-code the residual's magnitude class (position of its highest set
  *    bit after zigzag mapping) with an adaptive order-0 model — the
  *    equivalent of fpzip's fast range coder over sign + leading zeros.
  * 4. Copy the remaining significant bits verbatim.
  *
  * fpzip is a serial method; no thread parallelism is used.
  */
final class Fpzip extends Codec {
  override def name: String     = "fpzip"
  override def platform: String = "CPU"

  override def compress(block: FpBlock): Compressed = {
    val w      = block.precision.bits
    val mapped = block.bits.map(mapOrdered(_, w))
    val enc    = new RangeEncoder
    val model  = new AdaptiveModel(w + 1)
    val raw    = new BitWriter(block.n * block.precision.bytes / 2 + 64)

    val dims = shape(block)
    var i    = 0
    while (i < mapped.length) {
      val pred = lorenzoPredict(mapped, i, dims, w)
      // Wrap the residual to w bits and sign-extend so zigzag stays in w bits.
      val diff = (mapped(i) - pred) & mask(w)
      val r    = if (w == 64) diff else (diff << (64 - w)) >> (64 - w)
      val z    = (r << 1) ^ (r >> 63) // zigzag; fits in w bits (64-bit wraps)
      val sym  = 64 - java.lang.Long.numberOfLeadingZeros(z) // magnitude class 0..w
      model.encodeSymbol(enc, sym)
      if (sym > 1) raw.writeBits(z, sym - 1) // top bit of z is implicit
      i += 1
    }
    val symBytes = enc.finish()
    val rawBytes = raw.toArray
    val out      = new ByteBuf(symBytes.length + rawBytes.length + 8)
    writeInt(out, symBytes.length)
    out.write(symBytes)
    out.write(rawBytes)
    val bytes = out.toByteArray
    Compressed(bytes, WorkProfile(block.sizeBytes, bytes.length,
                                  block.n.toLong * 40, divergent = false))
  }

  override def decompress(data: Array[Byte], precision: Precision, extent: Seq[Long]): Decompressed = {
    val w        = precision.bits
    val n        = extent.product.toInt
    val symLen   = readInt(data, 0)
    val dec      = new RangeDecoder(data, 4)
    val raw      = new BitReader(data, 4 + symLen)
    val model    = new AdaptiveModel(w + 1)
    val mapped   = new Array[Long](n)
    val dims     = extent.map(_.toInt)
    var i = 0
    while (i < n) {
      val sym  = model.decodeSymbol(dec)
      val z =
        if (sym == 0) 0L
        else if (sym == 1) 1L
        else (1L << (sym - 1)) | raw.readBits(sym - 1)
      val r    = (z >>> 1) ^ -(z & 1) // un-zigzag
      val pred = lorenzoPredict(mapped, i, dims, w)
      mapped(i) = (pred + r) & mask(w)
      i += 1
    }
    val bits = mapped.map(unmapOrdered(_, w))
    Decompressed(FpBlock(precision, extent, bits),
                 WorkProfile(data.length, n.toLong * precision.bytes,
                             n.toLong * 40, divergent = false))
  }

  /** Order-preserving sign-magnitude map of a w-bit IEEE pattern (as Long). */
  private def mapOrdered(bits: Long, w: Int): Long = {
    val sign = 1L << (w - 1)
    if ((bits & sign) != 0) (~bits) & mask(w) else bits | sign
  }

  private def unmapOrdered(m: Long, w: Int): Long = {
    val sign = 1L << (w - 1)
    val mm   = m & mask(w)
    if ((mm & sign) != 0) mm & ~sign & mask(w) else (~mm) & mask(w)
  }

  private def mask(w: Int): Long = if (w == 64) -1L else (1L << w) - 1

  private def shape(block: FpBlock): Seq[Int] = block.extent.map(_.toInt)

  /** Lorenzo prediction from previously coded neighbors; boundary cells use
    * the scan-order predecessor (0 for the very first value).
    */
  private def lorenzoPredict(v: Array[Long], i: Int, dims: Seq[Int], w: Int): Long = {
    if (i == 0) return 0L
    dims.length match {
      case 1 => v(i - 1)
      case 2 =>
        val nx = dims(1) // fastest-varying
        val y  = i / nx; val x = i % nx
        if (y == 0 || x == 0) v(i - 1)
        else v(i - 1) + v(i - nx) - v(i - nx - 1)
      case _ =>
        val nz = dims(dims.length - 1)
        val ny = dims(dims.length - 2)
        val planeSz = ny * nz
        val p  = i / planeSz
        val r  = i % planeSz
        val y  = r / nz; val x = r % nz
        if (p == 0 || y == 0 || x == 0) v(i - 1)
        else v(i - 1) + v(i - nz) + v(i - planeSz) -
             v(i - nz - 1) - v(i - planeSz - 1) - v(i - planeSz - nz) +
             v(i - planeSz - nz - 1)
    }
  }

  private def writeInt(out: ByteBuf, v: Int): Unit = out.writeIntLE(v)

  private def readInt(data: Array[Byte], off: Int): Int =
    (data(off) & 0xff) | ((data(off + 1) & 0xff) << 8) |
    ((data(off + 2) & 0xff) << 16) | ((data(off + 3) & 0xff) << 24)
}
