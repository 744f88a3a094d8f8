package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 1; prints paper-vs-measured rows. */
class Table01Bench extends SparkSpec {
  test("table 1") {
    Experiments.printTable("Table 1", Experiments.table1(spark))
  }
}
