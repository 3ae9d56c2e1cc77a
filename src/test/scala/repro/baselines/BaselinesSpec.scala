package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.programs.Benchmarks

/** The baseline simulators must reproduce the success/failure pattern of
  * the paper's Table 1: MOLD translates the template-matchable programs but
  * not PageRank or Matrix Factorization; CASPER handles flat loops only.
  */
class BaselinesSpec extends AnyFunSuite {

  private def mold(name: String) =
    MoldSim.translate(Benchmarks.byName(name).source)
  private def casper(name: String, budgetMs: Long = 20000) =
    CasperSim.translate(Benchmarks.byName(name), budgetMs)

  // ------------------------------------------------------------- MOLD

  val moldTranslatable = List("String Match", "Word Count", "Histogram",
    "Matrix Multiplication", "Linear Regression", "KMeans", "PCA",
    "Sum", "Count", "Average", "Conditional Sum", "Conditional Count",
    "Equal", "Equal Frequency", "Group-By", "Matrix Addition")

  for (p <- moldTranslatable)
    test(s"MoldSim translates $p") {
      assert(mold(p).isInstanceOf[MoldSim.Translated], s"$p: ${mold(p)}")
    }

  test("MoldSim fails on PageRank (computed subscripts)") {
    assert(mold("PageRank").isInstanceOf[MoldSim.Failed])
  }

  test("MoldSim fails on Matrix Factorization (nested double update)") {
    assert(mold("Matrix Factorization").isInstanceOf[MoldSim.Failed])
  }

  test("MoldSim search visits more states for complex programs") {
    val simple = mold("Sum").states
    val complex = mold("KMeans").states
    assert(complex > simple)
  }

  // ----------------------------------------------------------- CASPER

  val casperSynthesizable = List("Sum", "Count", "Conditional Sum",
    "Conditional Count", "Equal", "Word Count", "Group-By", "Average")

  for (p <- casperSynthesizable)
    test(s"CasperSim synthesizes $p") {
      val r = casper(p)
      assert(r.isInstanceOf[CasperSim.Synthesized], s"$p: $r")
    }

  test("CasperSim fails on Matrix Multiplication (2-D output)") {
    assert(casper("Matrix Multiplication").isInstanceOf[CasperSim.Failed])
  }

  test("CasperSim fails on KMeans (record-valued output)") {
    assert(casper("KMeans").isInstanceOf[CasperSim.Failed])
  }

  test("CasperSim fails on Matrix Factorization") {
    assert(casper("Matrix Factorization").isInstanceOf[CasperSim.Failed])
  }

  test("CasperSim does not synthesize PageRank") {
    val r = casper("PageRank", budgetMs = 5000)
    assert(!r.isInstanceOf[CasperSim.Synthesized], s"got $r")
  }

  test("CasperSim times out on Linear Regression (out-of-grammar aggregates)") {
    val r = casper("Linear Regression", budgetMs = 3000)
    assert(r.isInstanceOf[CasperSim.Timeout], s"got $r")
  }

  test("CasperSim tries more candidates for Average than for Sum") {
    val s = casper("Sum").tried
    val a = casper("Average").tried
    assert(a > s)
  }
}
