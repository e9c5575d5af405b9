package repro.core

import repro.{PropSupport, SparkSpec}
import org.scalacheck.{Gen, Prop}

class CoreUtilSpec extends SparkSpec with PropSupport {

  test("ByteBuf single-byte writes") {
    val b = new ByteBuf(2)
    (0 until 1000).foreach(i => b.write(i & 0xff))
    val a = b.toArray
    assert(a.length == 1000)
    assert((0 until 1000).forall(i => (a(i) & 0xff) == (i & 0xff)))
  }

  test("ByteBuf bulk writes and writeIntLE") {
    val b = new ByteBuf()
    b.writeIntLE(0x04030201)
    b.write(Array[Byte](9, 8, 7), 1, 2)
    assert(b.toArray.toSeq == Seq[Byte](1, 2, 3, 4, 8, 7))
    assert(b.size == 6)
    assert(b.toByteArray.toSeq == b.toArray.toSeq)
  }

  test("Words.pack is identity for doubles") {
    val blk = FpBlock.fromDoubles(Array(1.0, 2.0, 3.0))
    assert(Words.pack(blk) eq blk.bits)
    assert(Words.unpack(Words.pack(blk), Precision.Double, blk.extent).bits.sameElements(blk.bits))
  }

  test("Words packs two singles per word, low half first") {
    val blk = FpBlock(Precision.Single, Seq(3L), Array(0x11223344L, 0xaabbccddL, 0x55667788L))
    val w   = Words.pack(blk)
    assert(w.length == 2)
    assert(w(0) == 0xaabbccdd11223344L)
    assert(w(1) == 0x0000000055667788L)
    val back = Words.unpack(w, Precision.Single, Seq(3L))
    assert(back.bits.sameElements(blk.bits))
  }

  test("Words.countFor") {
    assert(Words.countFor(5, Precision.Double) == 5)
    assert(Words.countFor(5, Precision.Single) == 3)
    assert(Words.countFor(4, Precision.Single) == 2)
  }

  test("property: Words pack/unpack roundtrips single precision") {
    val gen = Gen.listOf(Gen.choose(0L, 0xffffffffL)).suchThat(_.nonEmpty)
    checkProp(Prop.forAll(gen) { xs =>
      val blk = FpBlock(Precision.Single, Seq(xs.length.toLong), xs.toArray)
      Words.unpack(Words.pack(blk), Precision.Single, blk.extent).bits.sameElements(blk.bits)
    }, minTests = 40)
  }

  test("FpBlock toBytes/fromBytes roundtrips both precisions") {
    val rng = new scala.util.Random(5)
    val d   = FpBlock.fromDoubles(Array.fill(777)(rng.nextDouble() * 1e9))
    assert(FpBlock.fromBytes(Precision.Double, d.extent, d.toBytes).bits.sameElements(d.bits))
    val s = FpBlock.fromFloats(Array.fill(333)(rng.nextFloat()))
    assert(FpBlock.fromBytes(Precision.Single, s.extent, s.toBytes).bits.sameElements(s.bits))
  }

  test("FpBlock.as1d erases shape but keeps data") {
    val b = FpBlock.fromDoubles(Array.tabulate(12)(_.toDouble), Seq(3L, 4L))
    assert(b.as1d.extent == Seq(12L))
    assert(b.as1d.bits.sameElements(b.bits))
  }

  test("FpBlock rejects inconsistent extent") {
    intercept[IllegalArgumentException] {
      FpBlock(Precision.Double, Seq(5L), new Array[Long](4))
    }
  }

  test("Precision.fromTag") {
    assert(Precision.fromTag("S") == Precision.Single)
    assert(Precision.fromTag("D") == Precision.Double)
    intercept[IllegalArgumentException](Precision.fromTag("Q"))
  }

  test("Parallel.map preserves order and runs all items") {
    val out = Parallel.map((1 to 100).toIndexedSeq, 7)(_ * 2)
    assert(out == (1 to 100).map(_ * 2))
  }

  test("Parallel.map propagates exceptions") {
    intercept[Exception] {
      Parallel.map((1 to 10).toIndexedSeq, 4)(i => if (i == 5) throw new RuntimeException("boom") else i)
    }
  }

  test("CodecRegistry exposes the 14 evaluated methods") {
    val names = CodecRegistry.all.map(_.name)
    assert(names.size == 14)
    assert(names.distinct.size == 14)
    assert(CodecRegistry.cpu.size == 9 && CodecRegistry.gpu.size == 5)
    assert(CodecRegistry.cpu.forall(_.platform == "CPU"))
    assert(CodecRegistry.gpu.forall(_.platform == "GPU"))
    intercept[IllegalArgumentException](CodecRegistry.byName("zip2000"))
  }

  test("ThreadedCodec identification matches the paper's parallel methods") {
    val parallelNames = CodecRegistry.all.filter(_.parallel).map(_.name).toSet
    assert(parallelNames == Set("pFPC", "shf+LZ4", "shf+zstd", "ndzip-C"))
  }
}
