package repro.core

/** Carry-less byte-oriented range coder (Subbotin style).
  *
  * fpzip entropy-codes the sign and leading-zero count of each residual with
  * a fast range coder [Martin 1979]; this is the equivalent JVM
  * implementation. Total frequency must stay <= 2^16 so renormalization never
  * starves the range — [[AdaptiveModel]] rescales its counts to guarantee it.
  */
object RangeCoder {
  private[core] val Top: Long  = 1L << 24
  private[core] val Bot: Long  = 1L << 16
  private[core] val Mask: Long = 0xffffffffL
}

final class RangeEncoder {
  import RangeCoder._
  private val out           = new ByteBuf()
  private var low: Long     = 0L
  private var range: Long   = Mask

  def encode(cumFreq: Long, freq: Long, totFreq: Long): Unit = {
    require(freq > 0 && cumFreq + freq <= totFreq && totFreq <= Bot,
            s"bad freqs: cum=$cumFreq f=$freq tot=$totFreq")
    range /= totFreq
    low = (low + cumFreq * range) & Mask
    range *= freq
    normalize()
  }

  private def normalize(): Unit = {
    while (((low ^ (low + range)) & Mask) < Top || {
             if (range < Bot) { range = (-low) & (Bot - 1); true } else false
           }) {
      out.write(((low >>> 24) & 0xff).toInt)
      low = (low << 8) & Mask
      range = (range << 8) & Mask
    }
  }

  def finish(): Array[Byte] = {
    var i = 0
    while (i < 4) { out.write(((low >>> 24) & 0xff).toInt); low = (low << 8) & Mask; i += 1 }
    out.toByteArray
  }
}

final class RangeDecoder(buf: Array[Byte], start: Int = 0) {
  import RangeCoder._
  private var pos: Int    = start
  private var low: Long   = 0L
  private var range: Long = Mask
  private var code: Long  = 0L
  locally { var i = 0; while (i < 4) { code = ((code << 8) | nextByte()) & Mask; i += 1 } }

  private def nextByte(): Long =
    if (pos < buf.length) { val b = buf(pos) & 0xffL; pos += 1; b } else 0L

  /** Returns the cumulative-frequency slot of the next symbol. */
  def decodeFreq(totFreq: Long): Long = {
    range /= totFreq
    math.min(totFreq - 1, ((code - low) & Mask) / range)
  }

  /** Commit to the decoded symbol's (cumFreq, freq). */
  def decodeUpdate(cumFreq: Long, freq: Long): Unit = {
    low = (low + cumFreq * range) & Mask
    range *= freq
    while (((low ^ (low + range)) & Mask) < Top || {
             if (range < Bot) { range = (-low) & (Bot - 1); true } else false
           }) {
      code = ((code << 8) | nextByte()) & Mask
      low = (low << 8) & Mask
      range = (range << 8) & Mask
    }
  }

  /** Bytes consumed from the input so far. */
  def bytesConsumed: Int = pos - start
}

/** Order-0 adaptive frequency model over a small alphabet.
  *
  * Counts start at 1 (no zero-frequency symbols) and halve when the total
  * reaches 2^15, keeping the range coder's invariant totFreq <= 2^16.
  */
final class AdaptiveModel(val alphabet: Int) {
  private val freq  = Array.fill(alphabet)(1L)
  private var total = alphabet.toLong

  def encodeSymbol(enc: RangeEncoder, sym: Int): Unit = {
    var cum = 0L; var i = 0
    while (i < sym) { cum += freq(i); i += 1 }
    enc.encode(cum, freq(sym), total)
    update(sym)
  }

  def decodeSymbol(dec: RangeDecoder): Int = {
    val slot = dec.decodeFreq(total)
    var cum  = 0L; var sym = 0
    while (cum + freq(sym) <= slot) { cum += freq(sym); sym += 1 }
    dec.decodeUpdate(cum, freq(sym))
    update(sym)
    sym
  }

  private def update(sym: Int): Unit = {
    freq(sym) += 32
    total += 32
    if (total >= (1L << 15)) {
      total = 0
      var i = 0
      while (i < alphabet) { freq(i) = (freq(i) + 1) / 2; total += freq(i); i += 1 }
    }
  }
}
