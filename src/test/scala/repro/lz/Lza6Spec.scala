package repro.lz

import repro.{PropSupport, SparkSpec}
import org.scalacheck.{Gen, Prop}

class Lza6Spec extends SparkSpec with PropSupport {

  private def roundtrip(in: Array[Byte]): Array[Byte] =
    Lza6.decompress(Lza6.compress(in)._1, in.length)._1

  test("empty input") {
    assert(roundtrip(Array.empty).isEmpty)
  }

  test("input shorter than min match") {
    val in = Array[Byte](1, 2, 3)
    assert(roundtrip(in).sameElements(in))
  }

  test("highly repetitive input compresses well") {
    val in = Array.fill(100000)("abcdef".getBytes).flatten.take(100000)
    val (comp, _) = Lza6.compress(in)
    assert(comp.length < in.length / 10, s"got ${comp.length}")
    assert(roundtrip(in).sameElements(in))
  }

  test("incompressible input roundtrips") {
    val rng = new scala.util.Random(3)
    val in  = Array.fill(50000)(rng.nextInt().toByte)
    assert(roundtrip(in).sameElements(in))
  }

  test("long literal runs (>15, >270) roundtrip") {
    val rng = new scala.util.Random(4)
    for (n <- Seq(16, 271, 300, 1000)) {
      val in = Array.fill(n)(rng.nextInt().toByte)
      assert(roundtrip(in).sameElements(in), s"n=$n")
    }
  }

  test("long matches (>15+4, >270) roundtrip") {
    for (n <- Seq(50, 300, 5000)) {
      val in = Array.fill(n)(42.toByte)
      val (comp, _) = Lza6.compress(in)
      assert(roundtrip(in).sameElements(in), s"n=$n")
      assert(comp.length < n / 2 + 16, s"n=$n compressed to ${comp.length}")
    }
  }

  test("overlapping match copies (RLE-style) decode correctly") {
    val in = ("ab" * 5000).getBytes
    assert(roundtrip(in).sameElements(in))
  }

  test("matches beyond the 64KB window are not used") {
    // pattern at position 0 repeats after 100000 bytes of noise
    val rng     = new scala.util.Random(5)
    val pattern = "0123456789abcdef".getBytes
    val in      = pattern ++ Array.fill(100000)(rng.nextInt().toByte) ++ pattern
    assert(roundtrip(in).sameElements(in))
  }

  test("property: arbitrary byte arrays roundtrip") {
    val gen = for {
      n     <- Gen.choose(0, 3000)
      // mix of random and structured content
      bias  <- Gen.choose(1, 8)
      bytes <- Gen.listOfN(n, Gen.choose(0, (1 << bias) - 1).map(_.toByte))
    } yield bytes.toArray
    checkProp(Prop.forAll(gen)(in => roundtrip(in).sameElements(in)), minTests = 60)
  }

  test("backends: LZ4 roundtrip") {
    val rng = new scala.util.Random(6)
    val in  = Array.fill(10000)((rng.nextInt(8) + 'a').toByte)
    assert(Lz4Backend.decompress(Lz4Backend.compress(in), in.length).sameElements(in))
  }

  test("backends: zstd roundtrip") {
    val rng = new scala.util.Random(7)
    val in  = Array.fill(10000)((rng.nextInt(8) + 'a').toByte)
    assert(ZstdBackend.decompress(ZstdBackend.compress(in), in.length).sameElements(in))
  }

  test("backends: zstd empty input") {
    assert(ZstdBackend.decompress(ZstdBackend.compress(Array.empty), 0).isEmpty)
  }

  test("backends: LZ4 empty input") {
    assert(Lz4Backend.decompress(Lz4Backend.compress(Array.empty), 0).isEmpty)
  }
}
