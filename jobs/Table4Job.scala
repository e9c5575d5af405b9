package jobs

import repro.harness.tables.{Render, Table4}

/** spark-submit entrypoint reproducing the paper's Table 4. */
object Table4Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("fcbench-table4") { spark =>
    val result = Table4.run(spark)
    println(result.text)
    Render.save("table4", result.text)
  }
}
