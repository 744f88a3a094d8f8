package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 6. */
object Table6Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table6") { spark =>
    Experiments.printTable("Table 6", Experiments.table6(spark))
  }
}
