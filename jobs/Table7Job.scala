package jobs

import repro.harness.tables.{Render, Table7And8}

/** spark-submit entrypoint reproducing the paper's Table 7 (and 8's sweep). */
object Table7Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("fcbench-table7") { spark =>
    val result = Table7And8.run(spark)
    println(result.table7Text)
    Render.save("table7", result.table7Text)
  }
}
