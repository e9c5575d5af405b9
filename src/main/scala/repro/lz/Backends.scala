package repro.lz

import net.jpountz.lz4.LZ4Factory
import com.github.luben.zstd.Zstd

/** LZ4 block codec via lz4-java (already on the Spark classpath).
  *
  * Used by bitshuffle::LZ4 and the nvCOMP::LZ4 substitute. We use the fast
  * compressor — bitshuffle's C binding does the same — so compression and
  * decompression throughput stay in the paper's observed balance.
  */
object Lz4Backend {
  private val factory = LZ4Factory.fastestJavaInstance()

  def compress(in: Array[Byte]): Array[Byte] = {
    val c   = factory.fastCompressor()
    val max = c.maxCompressedLength(in.length)
    val buf = new Array[Byte](max)
    val n   = c.compress(in, 0, in.length, buf, 0, max)
    java.util.Arrays.copyOf(buf, n)
  }

  def decompress(in: Array[Byte], outLen: Int): Array[Byte] = {
    val out = new Array[Byte](outLen)
    factory.fastDecompressor().decompress(in, 0, out, 0, outLen)
    out
  }
}

/** zstd block codec via zstd-jni (already on the Spark classpath).
  *
  * Level 3 matches bitshuffle's default; the paper tunes "for best CR" but
  * levels beyond ~6 cost orders of magnitude in CT for single-digit-% CR on
  * floating-point residues, so we keep the library default the reference
  * implementation ships with.
  */
object ZstdBackend {
  val Level = 3

  def compress(in: Array[Byte]): Array[Byte] = Zstd.compress(in, Level)

  def decompress(in: Array[Byte], outLen: Int): Array[Byte] = {
    val out = new Array[Byte](outLen)
    Zstd.decompress(out, in)
    out
  }
}
