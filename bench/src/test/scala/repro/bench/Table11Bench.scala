package repro.bench

import repro.SparkSpec
import repro.harness.tables.{Render, Table11}

/** Regenerates Table 11 (read + decode + scan query on the TPC datasets in
  * the simulated DB) and checks Observation 9: retrieval cost tracks the
  * method's end-to-end profile — slow decompressors dominate query latency.
  */
class Table11Bench extends SparkSpec {

  private lazy val result = Table11.run(spark)

  test("Table 11 renders and persists") {
    println(result.text)
    Render.save("table11", result.text)
    assert(result.cells.size == 7 * 11)
  }

  test("all seven TPC datasets report a query time") {
    assert(result.queryMs.size == 7)
    assert(result.queryMs.values.forall(_ > 0))
  }

  private def meanDecode(codec: String): Double = {
    val xs = result.cells.filter(_.codec == codec).map(_.decodeMs)
    xs.sum / xs.size
  }

  test("Observation 9: slow serial decompressors cost the most decode time") {
    // decode time is the discriminating primitive — Parquet read time is
    // codec-independent noise at this corpus scale
    val fast = Seq("shf+LZ4", "shf+zstd", "ndzip-C").map(meanDecode).min
    val slow = Seq("fpzip", "Gorilla", "Chimp").map(meanDecode).max
    assert(slow > fast * 2, s"fast=$fast slow=$slow")
  }

  test("GPU methods' modeled retrieval is competitive (GFC/MPC fast decode)") {
    assert(meanDecode("MPC") < meanDecode("fpzip"))
    assert(meanDecode("GFC") < meanDecode("Gorilla"))
  }

  test("read time is roughly codec-independent, decode time is not") {
    val reads = result.cells.groupBy(_.codec).view.mapValues(cs =>
      cs.map(_.readMs).sum / cs.size).toMap
    val decs  = result.cells.groupBy(_.codec).view.mapValues(cs =>
      cs.map(_.decodeMs).sum / cs.size).toMap
    assert(reads.values.max / reads.values.min < 25,
           s"reads spread too wide: $reads")
    assert(decs.values.max / decs.values.min > 3,
           s"decode must differentiate codecs: $decs")
  }
}
