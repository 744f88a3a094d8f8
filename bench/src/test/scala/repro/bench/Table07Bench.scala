package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 7; prints paper-vs-measured rows. */
class Table07Bench extends SparkSpec {
  test("table 7") {
    Experiments.printTable("Table 7", Experiments.table7(spark))
  }
}
