package jobs

import repro.harness.tables.{Render, Table11}

/** spark-submit entrypoint reproducing the paper's Table 11. */
object Table11Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("fcbench-table11") { spark =>
    val result = Table11.run(spark)
    println(result.text)
    Render.save("table11", result.text)
  }
}
