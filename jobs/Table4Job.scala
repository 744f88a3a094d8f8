package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 4. */
object Table4Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table4") { spark =>
    Experiments.printTable("Table 4", Experiments.table4(spark))
  }
}
