package repro.bench

import repro.SparkSpec
import repro.harness.tables.{Render, Table9}

/** Regenerates Table 9 (dimension info vs 1-D flattening) and checks
  * Observation 6: compression is 1-d friendly — no significant CR change.
  */
class Table9Bench extends SparkSpec {

  private lazy val result = Table9.run(spark)

  test("Table 9 renders and persists") {
    println(result.text)
    Render.save("table9", result.text)
    assert(result.methods.map(_.codec) == Seq("GFC", "MPC", "fpzip", "ndzip-C", "ndzip-G"))
  }

  test("Observation 6: Mann-Whitney finds no significant difference (p > 0.05)") {
    result.methods.foreach { m =>
      assert(m.pValue > 0.05, s"${m.codec}: p=${m.pValue}")
    }
  }

  test("flattening changes CRs only modestly (within 15%)") {
    result.methods.foreach { m =>
      val ratio = m.odHarmonic / m.mdHarmonic
      assert(ratio > 0.85 && ratio < 1.15, s"${m.codec}: md=${m.mdHarmonic} 1d=${m.odHarmonic}")
    }
  }

  test("GFC is insensitive to dimension info (its predictor ignores it)") {
    val gfc = result.methods.find(_.codec == "GFC").get
    assert(math.abs(gfc.mdHarmonic - gfc.odHarmonic) < 0.02)
  }
}
