package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 10; prints paper-vs-measured rows. */
class Table10Bench extends SparkSpec {
  test("table 10") {
    Experiments.printTable("Table 10", Experiments.table10(spark))
  }
}
