package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 2. */
object Table2Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table2") { spark =>
    Experiments.printTable("Table 2", Experiments.table2(spark))
  }
}
