package repro.bench

import repro.SparkSpec
import repro.harness.tables.{Render, Table5}

/** Regenerates Table 5 (throughputs) and checks the paper's observations
  * 3 and 4 hold: GPU >> CPU, bitcomp fastest / nv::LZ4 slowest GPU
  * compressor, dictionary methods decompress faster than they compress.
  */
class Table5Bench extends SparkSpec {

  private lazy val result = Table5.run(spark)

  test("Table 5 renders and persists") {
    println(result.text)
    Render.save("table5", result.text)
  }

  test("Observation 3: GPU-based methods are orders of magnitude faster") {
    val gpu = Seq("GFC", "MPC", "nv:btcomp", "ndzip-G").map(result.compGBps)
    val cpu = Seq("pFPC", "SPDP", "fpzip", "shf+LZ4", "shf+zstd", "ndzip-C",
                  "BUFF", "Gorilla", "Chimp").map(result.compGBps)
    val gpuMedian = gpu.sorted.apply(gpu.size / 2)
    val cpuMedian = cpu.sorted.apply(cpu.size / 2)
    assert(gpuMedian / cpuMedian > 20, s"gpu=$gpuMedian cpu=$cpuMedian")
  }

  test("Observation 3: nv:btcomp is the fastest GPU compressor") {
    val gpu = Seq("GFC", "MPC", "nv:LZ4", "nv:btcomp", "ndzip-G")
    assert(gpu.maxBy(result.compGBps) == "nv:btcomp",
           gpu.map(m => m -> result.compGBps(m)).toString)
  }

  test("Observation 3: nv:LZ4 is the slowest GPU compressor (branch divergence)") {
    val gpu = Seq("GFC", "MPC", "nv:LZ4", "nv:btcomp", "ndzip-G")
    assert(gpu.minBy(result.compGBps) == "nv:LZ4",
           gpu.map(m => m -> result.compGBps(m)).toString)
  }

  test("Observation 3: the parallel CPU codecs out-compress the serial ones") {
    val parallelBest = Seq("pFPC", "shf+LZ4", "shf+zstd", "ndzip-C").map(result.compGBps).max
    val serialBest   = Seq("Gorilla", "Chimp", "fpzip", "SPDP").map(result.compGBps).max
    assert(parallelBest > serialBest,
           s"parallel=$parallelBest serial=$serialBest")
  }

  test("Observation 4: dictionary methods decompress faster than they compress") {
    assert(result.decompGBps("nv:LZ4") > result.compGBps("nv:LZ4") * 2,
           s"nv:LZ4 CT=${result.compGBps("nv:LZ4")} DT=${result.decompGBps("nv:LZ4")}")
    assert(result.decompGBps("Chimp") > result.compGBps("Chimp"),
           s"Chimp CT=${result.compGBps("Chimp")} DT=${result.decompGBps("Chimp")}")
  }

  test("Observation 4: delta/Lorenzo methods are balanced (within 3x)") {
    for (m <- Seq("GFC", "MPC", "ndzip-G")) {
      val r = result.decompGBps(m) / result.compGBps(m)
      assert(r > 1.0 / 3 && r < 3.0, s"$m CT/DT ratio $r")
    }
  }
}
