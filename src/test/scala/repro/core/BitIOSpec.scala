package repro.core

import repro.{PropSupport, SparkSpec}
import org.scalacheck.{Gen, Prop}

class BitIOSpec extends SparkSpec with PropSupport {

  test("single bits roundtrip") {
    val w = new BitWriter()
    val bits = Seq(1, 0, 1, 1, 0, 0, 1, 0, 1, 1, 1)
    bits.foreach(w.writeBit)
    val r = new BitReader(w.toArray)
    assert(bits.map(_ => r.readBit()) == bits)
  }

  test("full 64-bit words roundtrip") {
    val w = new BitWriter()
    val vals = Seq(-1L, 0L, Long.MinValue, Long.MaxValue, 0xdeadbeefL)
    vals.foreach(v => w.writeBits(v, 64))
    val r = new BitReader(w.toArray)
    vals.foreach(v => assert(r.readBits(64) == v))
  }

  test("mixed widths roundtrip") {
    val w = new BitWriter()
    w.writeBits(5, 3); w.writeBits(1023, 10); w.writeBits(0, 7); w.writeBits(1, 1)
    w.writeBits(0xffffL, 16)
    val r = new BitReader(w.toArray)
    assert(r.readBits(3) == 5)
    assert(r.readBits(10) == 1023)
    assert(r.readBits(7) == 0)
    assert(r.readBits(1) == 1)
    assert(r.readBits(16) == 0xffffL)
  }

  test("aligned bytes interleave with bits") {
    val w = new BitWriter()
    w.writeBits(5, 3)
    w.writeAlignedBytes(Array[Byte](1, 2, 3), 0, 3)
    w.writeBits(9, 5)
    val r = new BitReader(w.toArray)
    assert(r.readBits(3) == 5)
    assert(r.readAlignedBytes(3).toSeq == Seq[Byte](1, 2, 3))
    assert(r.readBits(5) == 9)
  }

  test("sizeBits tracks written bits exactly") {
    val w = new BitWriter()
    w.writeBits(1, 1); assert(w.sizeBits == 1)
    w.writeBits(0, 13); assert(w.sizeBits == 14)
    w.align(); assert(w.sizeBits == 16)
  }

  test("property: arbitrary (value, width) sequences roundtrip") {
    val pairGen = for {
      width <- Gen.choose(1, 64)
      value <- Gen.choose(Long.MinValue, Long.MaxValue)
    } yield (value & (if (width == 64) -1L else (1L << width) - 1), width)
    checkProp(Prop.forAll(Gen.listOfN(200, pairGen)) { pairs =>
      val w = new BitWriter()
      pairs.foreach { case (v, n) => w.writeBits(v, n) }
      val r = new BitReader(w.toArray)
      pairs.forall { case (v, n) => r.readBits(n) == v }
    })
  }

  test("writer grows past initial capacity") {
    val w = new BitWriter(4)
    (0 until 10000).foreach(i => w.writeBits(i.toLong, 17))
    val r = new BitReader(w.toArray)
    (0 until 10000).foreach(i => assert(r.readBits(17) == i.toLong))
  }
}
