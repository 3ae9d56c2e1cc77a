package repro.jobs

import repro.bench.Harness

/** Entrypoint for Table 2: shared-memory parallel (Scala parallel
  * collections) vs sequential evaluation of the 12 benchmark programs.
  */
object Table2Job {
  def main(args: Array[String]): Unit =
    Harness.printTable2(Harness.table2())
}
