package repro.codecs.cpu

import repro.core._

/** The ndzip algorithm [Knorr, Thoman & Fahringer, DCC'21], shared between
  * the CPU implementation and the GPU parallelization scheme (the pipeline is
  * identical; only the execution platform differs):
  *
  *   1. Tile the multi-dimensional grid into hypercube blocks of 4096
  *      elements (4096 / 64x64 / 16x16x16 per the data's dimensionality),
  *      gathered with the grid's true strides. Values outside the aligned
  *      region (border slabs) are stored verbatim — as in the reference
  *      implementation.
  *   2. Apply the *integer Lorenzo transform* inside each block — a separable
  *      forward-difference pass along each dimension over the raw bit
  *      patterns (wrapping integer arithmetic, hence lossless).
  *   3. Bit-transpose chunks of 32 (single) / 64 (double) residuals.
  *   4. Drop zero words, keeping a 32-/64-bit bitmap header per chunk and the
  *      non-zero words verbatim.
  *
  * Blocks encode independently: thread-level parallelism on the CPU, one
  * work-group per block on the GPU.
  */
object NdzipCore {
  val BlockElems = 4096

  def sideFor(dims: Int): Int = dims match {
    case 1 => 4096
    case 2 => 64
    case _ => 16
  }

  def mask(w: Int): Long = if (w == 64) -1L else (1L << w) - 1

  // ------------------------------------------------------------- tiling ----

  /** Grid geometry: extents, tile counts per dim, and the aligned bounds. */
  private final case class Geometry(ext: Array[Int], side: Int) {
    val dims: Int            = ext.length
    val tiles: Array[Int]    = ext.map(_ / side)
    val aligned: Array[Int]  = tiles.map(_ * side)
    val nTiles: Int          = tiles.product
    def strides: Array[Int] = {
      val s = new Array[Int](dims)
      s(dims - 1) = 1
      var d = dims - 2
      while (d >= 0) { s(d) = s(d + 1) * ext(d + 1); d -= 1 }
      s
    }
  }

  private def geometry(extent: Seq[Long]): Geometry = {
    val ext = (if (extent.length > 3) Seq(extent.product) else extent).map(_.toInt).toArray
    Geometry(ext, sideFor(ext.length))
  }

  /** Copy tile `t` between the flat grid and a 4096 buffer (gather/scatter). */
  private def moveTile(vals: Array[Long], buf: Array[Long], g: Geometry, t: Int,
                       gather: Boolean): Unit = {
    val s  = g.side
    val st = g.strides
    g.dims match {
      case 1 =>
        val base = t * s
        if (gather) System.arraycopy(vals, base, buf, 0, s)
        else System.arraycopy(buf, 0, vals, base, s)
      case 2 =>
        val ty = t / g.tiles(1); val tx = t % g.tiles(1)
        var y = 0
        while (y < s) {
          val src = (ty * s + y) * st(0) + tx * s
          if (gather) System.arraycopy(vals, src, buf, y * s, s)
          else System.arraycopy(buf, y * s, vals, src, s)
          y += 1
        }
      case _ =>
        val txy = g.tiles(1) * g.tiles(2)
        val tz  = t / txy
        val ty  = (t % txy) / g.tiles(2)
        val tx  = t % g.tiles(2)
        var z = 0
        while (z < s) {
          var y = 0
          while (y < s) {
            val src = (tz * s + z) * st(0) + (ty * s + y) * st(1) + tx * s
            if (gather) System.arraycopy(vals, src, buf, (z * s + y) * s, s)
            else System.arraycopy(buf, (z * s + y) * s, vals, src, s)
            y += 1
          }
          z += 1
        }
    }
  }

  /** Is flat index `i` inside the tile-aligned region? */
  private def inAligned(i: Int, g: Geometry): Boolean = {
    val st = g.strides
    var d = 0
    while (d < g.dims) {
      if ((i / st(d)) % g.ext(d) >= g.aligned(d)) return false
      d += 1
    }
    true
  }

  // ---------------------------------------------------------- transform ----

  /** Separable forward difference along each axis of the s^dims cube. */
  def forwardLorenzo(a: Array[Long], dims: Int, side: Int, w: Int): Unit = {
    val m = mask(w)
    var d = 0
    while (d < dims) {
      val stride = pow(side, dims - 1 - d)
      var i = a.length - 1
      while (i >= 0) {
        if ((i / stride) % side > 0) a(i) = (a(i) - a(i - stride)) & m
        i -= 1
      }
      d += 1
    }
  }

  def inverseLorenzo(a: Array[Long], dims: Int, side: Int, w: Int): Unit = {
    val m = mask(w)
    var d = dims - 1
    while (d >= 0) {
      val stride = pow(side, dims - 1 - d)
      var i = 0
      while (i < a.length) {
        if ((i / stride) % side > 0) a(i) = (a(i) + a(i - stride)) & m
        i += 1
      }
      d -= 1
    }
  }

  /** Exact w x w bit transpose (bit j of word i -> bit i of word j), built on
    * the in-place Hacker's Delight anti-transpose plus index/bit reversal —
    * the scalar stand-in for ndzip's SIMD transposition.
    */
  def bitTranspose(in: Array[Long], w: Int): Array[Long] = {
    val a = java.util.Arrays.copyOf(in, w)
    antiTranspose(a, w)
    val out = new Array[Long](w)
    var j = 0
    while (j < w) {
      val x = a(w - 1 - j)
      out(j) =
        if (w == 64) java.lang.Long.reverse(x)
        else java.lang.Integer.reverse(x.toInt).toLong & 0xffffffffL
      j += 1
    }
    out
  }

  /** In-place anti-transpose of a w x w bit matrix (HD §7-3 transpose32/64). */
  private def antiTranspose(a: Array[Long], w: Int): Unit = {
    var j = w >> 1
    var m = if (w == 64) 0x00000000ffffffffL else 0x0000ffffL
    while (j != 0) {
      var k = 0
      while (k < w) {
        val t = (a(k) ^ (a(k + j) >>> j)) & m
        a(k) ^= t
        a(k + j) ^= (t << j)
        k = (k + j + 1) & ~j
      }
      j >>= 1
      m = m ^ (m << j)
    }
  }

  // ------------------------------------------------------------ encoding ---

  /** Chunked bit transpose + zero-word elimination over one tile buffer. */
  private def encodeResiduals(work: Array[Long], w: Int): Array[Byte] = {
    val out   = new ByteBuf(work.length * w / 8 / 2 + 64)
    val bytes = w / 8
    var base  = 0
    while (base < work.length) {
      val chunk = java.util.Arrays.copyOfRange(work, base, base + w)
      val t     = bitTranspose(chunk, w)
      var head  = 0L
      var i = 0
      while (i < w) { if (t(i) != 0) head |= 1L << i; i += 1 }
      writeWord(out, head, bytes)
      i = 0
      while (i < w) { if (t(i) != 0) writeWord(out, t(i), bytes); i += 1 }
      base += w
    }
    out.toByteArray
  }

  private def decodeResiduals(data: Array[Byte], off: Int, w: Int): (Array[Long], Int) = {
    val work  = new Array[Long](BlockElems)
    val bytes = w / 8
    var pos   = off
    var base  = 0
    val chunk = new Array[Long](w)
    while (base < BlockElems) {
      val head = readWord(data, pos, bytes); pos += bytes
      var i = 0
      while (i < w) {
        chunk(i) = if (((head >>> i) & 1L) != 0) { val v = readWord(data, pos, bytes); pos += bytes; v }
                   else 0L
        i += 1
      }
      System.arraycopy(bitTranspose(chunk, w), 0, work, base, w)
      base += w
    }
    (work, pos - off)
  }

  // ------------------------------------------------------------ pipeline ---

  /** Compress one gathered 4096-element tile. Residuals are sign-rotated
    * (zigzag) after the Lorenzo transform: a small *negative* residual is
    * otherwise all-ones in its top bits under two's complement, which would
    * defeat the zero-word elimination after transposition.
    */
  def compressBlock(tile: Array[Long], dims: Int, w: Int): Array[Byte] = {
    val work = java.util.Arrays.copyOf(tile, tile.length)
    forwardLorenzo(work, dims, sideFor(dims), w)
    val m = mask(w)
    var i = 0
    while (i < work.length) {
      val rs = if (w == 64) work(i) else (work(i) << (64 - w)) >> (64 - w)
      work(i) = ((rs << 1) ^ (rs >> 63)) & m
      i += 1
    }
    encodeResiduals(work, w)
  }

  def decompressBlock(data: Array[Byte], off: Int, dims: Int, w: Int): (Array[Long], Int) = {
    val (work, consumed) = decodeResiduals(data, off, w)
    val m = mask(w)
    var i = 0
    while (i < work.length) {
      val z = work(i)
      work(i) = ((z >>> 1) ^ -(z & 1)) & m
      i += 1
    }
    inverseLorenzo(work, dims, sideFor(dims), w)
    (work, consumed)
  }

  /** Full-stream compression over the true extent: aligned hypercube tiles
    * through the pipeline, the border region verbatim.
    * Layout: [nTiles:4][len_i:4 x nTiles][payloads][border values raw].
    */
  def compress(block: FpBlock, threads: Int): Compressed = {
    val w    = block.precision.bits
    val g    = geometry(block.extent)
    val vals = block.bits
    val parts = Parallel.map((0 until g.nTiles).toIndexedSeq, threads) { t =>
      val buf = new Array[Long](BlockElems)
      moveTile(vals, buf, g, t, gather = true)
      compressBlock(buf, g.dims, w)
    }
    val out = new ByteBuf()
    out.writeIntLE(g.nTiles)
    parts.foreach(p => out.writeIntLE(p.length))
    parts.foreach(out.write)
    var i = 0
    while (i < vals.length) {
      if (g.nTiles == 0 || !inAligned(i, g)) writeWord(out, vals(i), w / 8)
      i += 1
    }
    val bytes = out.toByteArray
    // calibrated vs the SC'21 implementation's instruction mix (DESIGN.md #2)
    val ops = block.sizeBytes * 7
    Compressed(bytes, WorkProfile(block.sizeBytes * 2, bytes.length, ops, divergent = false))
  }

  def decompress(data: Array[Byte], precision: Precision, extent: Seq[Long], threads: Int): Decompressed = {
    val w = precision.bits
    val g = geometry(extent)
    val n = extent.product.toInt
    val nT = readInt(data, 0)
    require(nT == g.nTiles, s"tile count mismatch: $nT vs ${g.nTiles}")
    val lengths = (0 until nT).map(i => readInt(data, 4 + 4 * i))
    val offsets = lengths.scanLeft(4 + 4 * nT)(_ + _)
    val vals    = new Array[Long](n)
    Parallel.map((0 until nT).toIndexedSeq, threads) { t =>
      val (buf, _) = decompressBlock(data, offsets(t), g.dims, w)
      moveTile(vals, buf, g, t, gather = false)
    }
    var pos = offsets.last
    var i = 0
    while (i < n) {
      if (nT == 0 || !inAligned(i, g)) { vals(i) = readWord(data, pos, w / 8); pos += w / 8 }
      i += 1
    }
    val ops = n.toLong * precision.bytes * 7
    Decompressed(FpBlock(precision, extent, vals),
                 WorkProfile(data.length + n.toLong * precision.bytes,
                             n.toLong * precision.bytes, ops, divergent = false))
  }

  // ------------------------------------------------------------- util ------

  private def pow(b: Int, e: Int): Int = { var r = 1; var i = 0; while (i < e) { r *= b; i += 1 }; r }

  private def writeWord(out: ByteBuf, v: Long, bytes: Int): Unit = {
    var i = 0
    while (i < bytes) { out.write(((v >>> (8 * i)) & 0xff).toInt); i += 1 }
  }

  private def readWord(data: Array[Byte], off: Int, bytes: Int): Long = {
    var v = 0L
    var i = 0
    while (i < bytes) { v |= (data(off + i) & 0xffL) << (8 * i); i += 1 }
    v
  }

  private def readInt(data: Array[Byte], off: Int): Int =
    (data(off) & 0xff) | ((data(off + 1) & 0xff) << 8) |
    ((data(off + 2) & 0xff) << 16) | ((data(off + 3) & 0xff) << 24)
}

/** ndzip-CPU — the SIMD+threads implementation; here, thread parallelism
  * over hypercube tiles.
  */
final class NdzipCpu(val threads: Int = Runtime.getRuntime.availableProcessors())
    extends ThreadedCodec {
  override def name: String     = "ndzip-C"
  override def platform: String = "CPU"
  override def withThreads(t: Int): Codec = new NdzipCpu(t)

  override def compress(block: FpBlock): Compressed = NdzipCore.compress(block, threads)

  override def decompress(data: Array[Byte], precision: Precision, extent: Seq[Long]): Decompressed =
    NdzipCore.decompress(data, precision, extent, threads)
}
