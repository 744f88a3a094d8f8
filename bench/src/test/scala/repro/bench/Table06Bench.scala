package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 6; prints paper-vs-measured rows. */
class Table06Bench extends SparkSpec {
  test("table 6") {
    Experiments.printTable("Table 6", Experiments.table6(spark))
  }
}
