package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 3; prints paper-vs-measured rows. */
class Table03Bench extends SparkSpec {
  test("table 3") {
    Experiments.printTable("Table 3", Experiments.table3(spark))
  }
}
