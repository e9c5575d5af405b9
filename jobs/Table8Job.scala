package jobs

import repro.harness.tables.{Render, Table7And8}

/** spark-submit entrypoint reproducing the paper's Table 8. */
object Table8Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("fcbench-table8") { spark =>
    val result = Table7And8.run(spark)
    println(result.table8Text)
    Render.save("table8", result.table8Text)
  }
}
