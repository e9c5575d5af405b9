package repro.codecs.cpu

import repro.core._

/** BUFF [Liu et al., VLDB'21] — decomposed bounded floats.
  *
  * BUFF targets low-precision data (server metrics, IoT): each value is split
  * into integer and fractional parts, the fraction is kept to the bit budget
  * of the target decimal precision (Table 2 of the paper), values are stored
  * as fixed-point deltas from the block minimum, padded to whole bytes, and
  * laid out byte-plane by byte-plane ("sub-columns") so predicates can be
  * evaluated on compressed data one byte plane at a time.
  *
  * Losslessness: the encoder *detects* the minimal decimal precision p such
  * that every value round-trips bit-exactly (p <= 10). If none exists — the
  * data is not bounded-precision — the block is stored verbatim (the paper's
  * CRs below 1.0 on HPC data reflect the same failure mode).
  *
  * Layout: [mode:1][p:1][m:1][totalBits:1][qmin:8][n byte planes, LSB first].
  */
final class Buff extends Codec {
  override def name: String     = "BUFF"
  override def platform: String = "CPU"

  /** Table 2 of the paper: fraction bits needed per decimal precision 1..10. */
  private val BitsForPrecision = Array(0, 5, 8, 11, 15, 18, 21, 25, 28, 31, 35)

  override def compress(block: FpBlock): Compressed = {
    val doubles = block.toDoubles
    val plan    = findPrecision(doubles, block.precision)
    val work    = WorkProfile(block.sizeBytes * 2, 0, block.n.toLong * 30, divergent = false)
    plan match {
      case None =>
        val raw = block.toBytes
        val out = new Array[Byte](raw.length + 1)
        out(0) = 0 // raw mode
        System.arraycopy(raw, 0, out, 1, raw.length)
        Compressed(out, work.copy(bytesWritten = out.length))
      case Some((p, m, qmin, qs)) =>
        val span      = qs.map(_ - qmin).max
        val totalBits = math.max(1, 64 - java.lang.Long.numberOfLeadingZeros(span))
        val nBytes    = (totalBits + 7) / 8
        val out       = new Array[Byte](12 + nBytes * qs.length)
        out(0) = 1 // packed mode
        out(1) = p.toByte
        out(2) = m.toByte
        out(3) = totalBits.toByte
        var k = 0
        while (k < 8) { out(4 + k) = ((qmin >>> (8 * k)) & 0xff).toByte; k += 1 }
        // Byte-plane (sub-column) layout: plane b holds byte b of every delta.
        var b = 0
        while (b < nBytes) {
          var i = 0
          while (i < qs.length) {
            out(12 + b * qs.length + i) = (((qs(i) - qmin) >>> (8 * b)) & 0xff).toByte
            i += 1
          }
          b += 1
        }
        Compressed(out, work.copy(bytesWritten = out.length))
    }
  }

  override def decompress(data: Array[Byte], precision: Precision, extent: Seq[Long]): Decompressed = {
    val n    = extent.product.toInt
    val work = WorkProfile(data.length, n.toLong * precision.bytes, n.toLong * 12, divergent = false)
    if (data(0) == 0) {
      val raw = java.util.Arrays.copyOfRange(data, 1, data.length)
      Decompressed(FpBlock.fromBytes(precision, extent, raw), work)
    } else {
      val p         = data(1).toInt
      val m         = data(2).toInt
      val totalBits = data(3).toInt
      val nBytes    = (totalBits + 7) / 8
      var qmin      = 0L
      var k = 0
      while (k < 8) { qmin |= (data(4 + k) & 0xffL) << (8 * k); k += 1 }
      val doubles = new Array[Double](n)
      var i = 0
      while (i < n) {
        var delta = 0L
        var b = 0
        while (b < nBytes) { delta |= (data(12 + b * n + i) & 0xffL) << (8 * b); b += 1 }
        doubles(i) = dequantize(qmin + delta, m, p)
        i += 1
      }
      val block = precision match {
        case Precision.Double => FpBlock.fromDoubles(doubles, extent)
        case Precision.Single => FpBlock.fromFloats(doubles.map(_.toFloat), extent)
      }
      Decompressed(block, work)
    }
  }

  /** Count of values <= threshold, evaluated on the compressed byte planes
    * without materializing the floats (BUFF's byte-column query). Planes are
    * compared most-significant first; a record is disqualified as soon as a
    * higher plane decides.
    */
  def scanLessEqual(data: Array[Byte], n: Int, threshold: Double): Long = {
    require(data(0) == 1, "scan on compressed data requires packed mode")
    val p         = data(1).toInt
    val m         = data(2).toInt
    val totalBits = data(3).toInt
    val nBytes    = (totalBits + 7) / 8
    var qmin      = 0L
    var k = 0
    while (k < 8) { qmin |= (data(4 + k) & 0xffL) << (8 * k); k += 1 }
    // Largest quantized step whose dequantized value still satisfies the
    // predicate — exact because dequantize is monotone in q.
    var qt = math.rint(threshold * (1L << m)).toLong
    while (dequantize(qt, m, p) > threshold) qt -= 1
    while (dequantize(qt + 1, m, p) <= threshold) qt += 1
    val qThr = qt - qmin
    if (qThr < 0) return 0L
    if (qThr >= (1L << math.min(62, 8 * nBytes))) return n.toLong // all deltas fit nBytes
    var count = 0L
    var i = 0
    while (i < n) {
      var decided = false
      var le      = true
      var b       = nBytes - 1
      while (b >= 0 && !decided) {
        val dv = data(12 + b * n + i) & 0xff
        val tv = ((qThr >>> (8 * b)) & 0xff).toInt
        if (dv != tv) { le = dv < tv; decided = true }
        b -= 1
      }
      if (le) count += 1
      i += 1
    }
    count
  }

  /** Find the smallest decimal precision p (0..10) such that quantizing every
    * value to BitsForPrecision(p) fraction bits round-trips bit-exactly.
    * Returns (p, fracBits, qmin, quantized values).
    */
  private def findPrecision(values: Array[Double], precision: Precision)
      : Option[(Int, Int, Long, Array[Long])] = {
    var p = 0
    while (p <= 10) {
      val m  = BitsForPrecision(p)
      val qs = new Array[Long](values.length)
      var ok = true
      var i  = 0
      while (ok && i < values.length) {
        val v = values(i)
        // Keep |v| * 2^m well inside Long range before quantizing.
        if (v.isNaN || v.isInfinite || math.abs(v) >= math.pow(2, 61 - m)) ok = false
        else {
          val q = math.rint(v * (1L << m)).toLong
          val d = dequantize(q, m, p)
          val exact = precision match {
            case Precision.Double =>
              java.lang.Double.doubleToRawLongBits(d) == java.lang.Double.doubleToRawLongBits(v)
            case Precision.Single =>
              java.lang.Float.floatToRawIntBits(d.toFloat) == java.lang.Float.floatToRawIntBits(v.toFloat)
          }
          if (exact) qs(i) = q else ok = false
        }
        i += 1
      }
      if (ok) {
        val qmin = if (qs.isEmpty) 0L else qs.min
        return Some((p, m, qmin, qs))
      }
      p += 1
    }
    None
  }

  /** Invert quantization: fixed point back to a p-decimal value. */
  private def dequantize(q: Long, m: Int, p: Int): Double = {
    val x = q.toDouble / (1L << m).toDouble
    if (p == 0) math.rint(x)
    else {
      val scale = math.pow(10, p)
      math.rint(x * scale) / scale
    }
  }
}
