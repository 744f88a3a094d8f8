package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table 8; prints paper-vs-measured rows. */
class Table08Bench extends SparkSpec {
  test("table 8") {
    Experiments.printTable("Table 8", Experiments.table8(spark))
  }
}
