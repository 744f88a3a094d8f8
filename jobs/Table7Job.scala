package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 7. */
object Table7Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table7") { spark =>
    Experiments.printTable("Table 7", Experiments.table7(spark))
  }
}
