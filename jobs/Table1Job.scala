package repro.jobs

import repro.bench.Harness

/** spark-submit entrypoint for Table 1 (no Spark needed — pure translation
  * timing): prints the paper-vs-ours compilation-time table.
  *
  * usage: Table1Job [casperBudgetSecs]
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val budget = (if (args.nonEmpty) args(0).toLong else 45L) * 1000
    Harness.printTable1(Harness.table1(budget))
  }
}
