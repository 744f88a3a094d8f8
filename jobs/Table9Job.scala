package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 9. */
object Table9Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table9") { spark =>
    Experiments.printTable("Table 9", Experiments.table9(spark))
  }
}
