package repro.bench

import repro.SparkSpec
import repro.harness.tables.{PaperNumbers, Render, Table10}

/** Regenerates Table 10 (block-size sweep) and checks Observation 8:
  * compressors prefer larger block sizes.
  */
class Table10Bench extends SparkSpec {

  private lazy val result = Table10.run(spark)

  test("Table 10 renders and persists") {
    println(result.text)
    Render.save("table10", result.text)
    assert(result.cells.size == 3 * 8)
  }

  test("Observation 8: most methods improve CR from 4K to 64K blocks") {
    val improved = PaperNumbers.Table10Methods.count { m =>
      val cr4  = result.cells.find(c => c.codec == m && c.blockBytes == 4096).get.cr
      val cr64 = result.cells.find(c => c.codec == m && c.blockBytes == 65536).get.cr
      cr64 >= cr4 * 0.999
    }
    assert(improved >= 5, s"only $improved of 8 improved")
  }

  test("Observation 8: throughput rises with block size for most CPU methods") {
    val cpu = Seq("pFPC", "SPDP", "shf+LZ4", "shf+zstd", "Gorilla", "Chimp")
    val improved = cpu.count { m =>
      val ct4  = result.cells.find(c => c.codec == m && c.blockBytes == 4096).get.ctGBps
      val ct8m = result.cells.find(c => c.codec == m && c.blockBytes == 8 * 1024 * 1024).get.ctGBps
      ct8m > ct4
    }
    assert(improved >= 4, s"only $improved of 6 improved")
  }

  test("pFPC suffers most at 4K blocks (hash tables never warm up)") {
    val cr4  = result.cells.find(c => c.codec == "pFPC" && c.blockBytes == 4096).get
    val ct8m = result.cells.find(c => c.codec == "pFPC" && c.blockBytes == 8 * 1024 * 1024).get
    assert(ct8m.ctGBps > cr4.ctGBps, "per-block table rebuild must cost throughput")
  }
}
