package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 8. */
object Table8Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table8") { spark =>
    Experiments.printTable("Table 8", Experiments.table8(spark))
  }
}
