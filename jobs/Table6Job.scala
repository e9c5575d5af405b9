package jobs

import repro.harness.tables.{Render, Table6}

/** spark-submit entrypoint reproducing the paper's Table 6. */
object Table6Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("fcbench-table6") { spark =>
    val result = Table6.run(spark)
    println(result.text)
    Render.save("table6", result.text)
  }
}
