package repro.bench

import repro.SparkSpec
import repro.harness.tables.{Render, Table7And8}

/** Regenerates Tables 7 and 8 (thread scalability). This VM exhibits
  * multi-second CPU-steal dips, so assertions are deliberately loose: we
  * check that parallelism is available and not pathological, and leave the
  * numbers themselves as the artifact.
  */
class Table7And8Bench extends SparkSpec {

  private lazy val result = Table7And8.run(spark)

  test("Tables 7/8 render and persist") {
    println(result.table7Text)
    println(result.table8Text)
    Render.save("table7", result.table7Text)
    Render.save("table8", result.table8Text)
  }

  test("sweep covers the thread counts for all four parallel codecs") {
    assert(result.points.keySet == Set("pFPC", "shf+LZ4", "shf+zstd", "ndzip-C"))
    result.points.values.foreach { pts =>
      assert(pts.map(_.threads) == Seq(1, 2, 4, 8, 16, 24, 32))
      assert(pts.forall(p => p.compMBps > 0 && p.decompMBps > 0))
    }
  }

  test("Observation 7: parallel compressors can scale up (best > 1-thread)") {
    // at least two of the four codecs must show a real (>1.3x) best-case
    // speedup even under environment noise
    val speedups = result.points.map { case (n, pts) =>
      n -> pts.map(_.compMBps).max / pts.find(_.threads == 1).get.compMBps
    }
    assert(speedups.values.count(_ > 1.3) >= 2, s"speedups: $speedups")
  }
}
