package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 2; prints paper-vs-measured rows. */
class Table02Bench extends SparkSpec {
  test("table 2") {
    Experiments.printTable("Table 2", Experiments.table2(spark))
  }
}
