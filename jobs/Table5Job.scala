package repro.jobs

import repro.exp.Experiments

/** spark-submit entrypoint reproducing paper Table 5. */
object Table5Job {
  def main(args: Array[String]): Unit = JobMain.withSpark("dial-table5") { spark =>
    Experiments.printTable("Table 5", Experiments.table5(spark))
  }
}
