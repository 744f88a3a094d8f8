package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 5; prints paper-vs-measured rows. */
class Table05Bench extends SparkSpec {
  test("table 5") {
    Experiments.printTable("Table 5", Experiments.table5(spark))
  }
}
