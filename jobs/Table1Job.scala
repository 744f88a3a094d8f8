package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 1. */
object Table1Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table1") { spark =>
    Experiments.printTable("Table 1", Experiments.table1(spark))
  }
}
