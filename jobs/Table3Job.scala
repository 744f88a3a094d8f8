package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 3. */
object Table3Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table3") { spark =>
    Experiments.printTable("Table 3", Experiments.table3(spark))
  }
}
