package repro.codecs

import repro.SparkSpec
import repro.core.CodecRegistry

/** Bit-exact roundtrip of every registered codec over the full input corpus:
  * 14 codecs x 13 structurally distinct blocks. Losslessness is the one
  * property FCBench takes as a precondition for every method.
  */
class CodecRoundtripSpec extends SparkSpec {
  for (codec <- CodecRegistry.all; (inputName, block) <- TestInputs.corpus) {
    test(s"${codec.name} roundtrips $inputName bit-exactly") {
      val comp = codec.compress(block)
      val dec  = codec.decompress(comp.bytes, block.precision, block.extent)
      assert(dec.block.precision == block.precision)
      assert(dec.block.extent == block.extent)
      assert(dec.block.bits.sameElements(block.bits),
             s"first mismatch at index ${dec.block.bits.zip(block.bits).indexWhere(p => p._1 != p._2)}")
    }
  }

  for (codec <- CodecRegistry.all) {
    test(s"${codec.name} reports a plausible work profile") {
      val block = TestInputs.smooth1dD(2000)
      val comp  = codec.compress(block)
      assert(comp.work.bytesRead > 0)
      assert(comp.work.bytesWritten > 0)
      assert(comp.work.ops > 0)
    }

    test(s"${codec.name} compresses smooth data better than random data") {
      val smooth = codec.compress(TestInputs.smooth1dD(8192)).bytes.length
      val random = codec.compress(TestInputs.randomD(8192)).bytes.length
      // Smooth, neighbor-correlated data must never compress *worse* than
      // full-entropy mantissas (allow 2% slack for framing overhead).
      assert(smooth <= random * 1.02,
             s"smooth=$smooth random=$random")
    }
  }
}
