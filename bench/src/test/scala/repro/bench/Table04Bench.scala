package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 4; prints paper-vs-measured rows. */
class Table04Bench extends SparkSpec {
  test("table 4") {
    Experiments.printTable("Table 4", Experiments.table4(spark))
  }
}
