package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 10. */
object Table10Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table10") { spark =>
    Experiments.printTable("Table 10", Experiments.table10(spark))
  }
}
