package jobs

import repro.harness.tables.{Render, Table10}

/** spark-submit entrypoint reproducing the paper's Table 10. */
object Table10Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("fcbench-table10") { spark =>
    val result = Table10.run(spark)
    println(result.text)
    Render.save("table10", result.text)
  }
}
