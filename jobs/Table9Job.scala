package jobs

import repro.harness.tables.{Render, Table9}

/** spark-submit entrypoint reproducing the paper's Table 9. */
object Table9Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("fcbench-table9") { spark =>
    val result = Table9.run(spark)
    println(result.text)
    Render.save("table9", result.text)
  }
}
