package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 9; prints paper-vs-measured rows. */
class Table09Bench extends SparkSpec {
  test("table 9") {
    Experiments.printTable("Table 9", Experiments.table9(spark))
  }
}
