package jobs

import repro.harness.tables.{Render, Table5}

/** spark-submit entrypoint reproducing the paper's Table 5. */
object Table5Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("fcbench-table5") { spark =>
    val result = Table5.run(spark)
    println(result.text)
    Render.save("table5", result.text)
  }
}
