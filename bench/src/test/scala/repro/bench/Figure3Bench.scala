package repro.bench

import repro.SparkSpec

/** Figure 3 reproduced as a table: DIABLO-generated Spark programs vs
  * hand-written Spark programs. The shape under test (the paper's stated
  * conclusion): comparable performance for the simple programs, DIABLO
  * slower on KMeans (joins instead of broadcast centroids) and on Matrix
  * Factorization / PageRank (extra joins).
  */
class Figure3Bench extends SparkSpec {

  test("Figure 3: DIABLO vs hand-written Spark") {
    val rows = Harness.figure3(spark)
    Harness.printFigure3(rows)

    val byName = rows.map(r => r.name -> r).toMap

    // KMeans: hand-written broadcasts centroids; DIABLO pays a cross join
    assert(byName("KMeans").ratio > 1.5,
      s"KMeans ratio ${byName("KMeans").ratio}")

    // every program completes; ratios are positive and finite
    for (r <- rows) {
      assert(r.diabloMs > 0 && r.handMs > 0, r.name)
      assert(!r.ratio.isNaN && !r.ratio.isInfinite, r.name)
    }

    // the simple aggregations stay within a moderate factor of hand-written
    val simple = List("Conditional Sum", "Equal", "String Match",
      "Linear Regression")
    for (n <- simple)
      assert(byName(n).ratio < 25.0, s"$n ratio ${byName(n).ratio}")
  }
}
